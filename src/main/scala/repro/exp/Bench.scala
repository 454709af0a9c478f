package repro.exp

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core._
import repro.data.Dataset
import repro.baseline._

/** Shared harness utilities for the T1–T11 evaluation reproductions. */
object Bench {

  def time[T](f: => T): (T, Long) = {
    val t0 = System.nanoTime
    val r  = f
    (r, (System.nanoTime - t0) / 1000000)
  }

  def fmtTable(title: String, header: Seq[String], rows: Seq[Seq[Any]]): String = {
    val all = header +: rows.map(_.map {
      case d: Double => f"$d%.2f"
      case x         => x.toString
    })
    val widths = header.indices.map(i => all.map(_(i).length).max)
    def line(r: Seq[String]) = r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("  ")
    (s"== $title ==" +: line(all.head) +: all.tail.map(line)).mkString("\n")
  }

  /** Factorized GBM training with timings. */
  def joinBoostGbm(
      ds: Dataset,
      nTrees: Int,
      maxLeaves: Int = 8,
      strategy: ResidualStrategy = new MemSwap,
      featureParallelism: Int = 8,
      metrics: Metrics = new Metrics,
  ): (BoostResult, Long) = {
    val (res, ms) = time {
      new GradientBoosting(
        ds.annotated(), ds.yRelation, ds.clusters, ds.features,
        BoostParams(nTrees = nTrees, tree = TreeParams(maxLeaves = maxLeaves, featureParallelism = featureParallelism)),
        strategy, CacheMode.Shared, metrics,
      ).train()
    }
    (res, ms)
  }

  /** Factorized RF training with timings. */
  def joinBoostRf(ds: Dataset, nTrees: Int, maxLeaves: Int = 8, treeParallelism: Int = 4): (ForestModel, Long) =
    time {
      new RandomForest(
        ds.annotated(), ds.yRelation, ds.features,
        RFParams(nTrees = nTrees, sampleRate = 0.1, featureRate = 0.8,
          tree = TreeParams(maxLeaves = maxLeaves, featureParallelism = 2),
          treeParallelism = treeParallelism),
      ).train()
    }

  /** The ML-library baseline pipeline: materialize → export CSV → load →
    * in-memory array training. Fails with OutOfBudget under the simulated
    * memory limit (see DESIGN.md).
    */
  final case class BaselineRun(
      costs: Materialize.Costs,
      trainMs: Long,
      table: WideTable,
      gbdt: InMemoryGBDT,
  )

  def baselinePrepare(spark: SparkSession, ds: Dataset, cellBudget: Long, knownRows: Long,
                      maxLeaves: Int = 8): BaselineRun = {
    val numeric = ds.features.filter(_.kind == NumericF)
    Materialize.checkBudget(knownRows, numeric.size + 1, cellBudget)
    val keep = numeric.map(f => s"${f.relation}__${f.column}") :+ Materialize.wideTargetCol(ds)
    val (loaded, costs) = Materialize.exportLoad(spark, Materialize.wide(ds), keep)
    val (table, collectMs) = time(WideTable.fromWide(loaded, numeric, Materialize.wideTargetCol(ds)))
    BaselineRun(costs.copy(loadMs = costs.loadMs + collectMs), 0L,
      table, new InMemoryGBDT(table, TreeParams(maxLeaves = maxLeaves)))
  }

  /** rmse of a model (raw-feature space) over the materialized join. */
  def rmseOnWide(ds: Dataset, predict: DataFrame => org.apache.spark.sql.Column): Double = {
    val wide = Materialize.wide(ds)
    Boosting.rmse(wide, col(Materialize.wideTargetCol(ds)), predict(wide))
  }

  def scale: Double = sys.env.get("BENCH_SCALE").map(_.toDouble).getOrElse(1.0)

  def header(tag: String, detail: String): String =
    s"\n[$tag] $detail (BENCH_SCALE=$scale)"
}
