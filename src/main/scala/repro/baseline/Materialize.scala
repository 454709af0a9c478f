package repro.baseline

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core._
import repro.data.Dataset

/** Costs an ML-library baseline pays before training can even start
  * (paper §6 "Methods"): materialize the denormalized join, export it as
  * CSV, and load the CSV back. Also hosts the *simulated* memory budget that
  * stands in for LightGBM's observed 125 GB out-of-memory wall (paper
  * Figs 10/11): at laptop scale nothing actually OOMs, so the baseline
  * refuses workloads whose wide table exceeds `cellBudget` rows×cols cells.
  */
object Materialize {

  final case class Costs(materializeMs: Long, exportMs: Long, loadMs: Long, rows: Long, cols: Int) {
    def totalMs: Long = materializeMs + exportMs + loadMs
  }

  final case class OutOfBudget(cells: Long, budget: Long)
      extends RuntimeException(s"simulated OOM: wide table has $cells cells > budget $budget")

  /** Wide (denormalized) table of a dataset: features as `rel__col`, target
    * as `<yRel>__<yCol>`.
    */
  def wide(ds: Dataset): DataFrame =
    Joins.materializeJoin(JoinGraph(ds.relations, ds.edges))

  def wideTargetCol(ds: Dataset): String = s"${ds.yRelation}__${ds.yCol}"

  /** Estimate of wide-table cells for the budget gate (exact row count is
    * itself a join query; callers pass a known/estimated row count).
    */
  def checkBudget(rows: Long, cols: Int, cellBudget: Long): Unit = {
    val cells = rows * cols
    if (cellBudget > 0 && cells > cellBudget) throw OutOfBudget(cells, cellBudget)
  }

  /** Materialize + CSV-export + CSV-load, returning the re-loaded frame and
    * the per-phase costs the ML library baseline is charged with.
    */
  def exportLoad(spark: SparkSession, wide: DataFrame, keepCols: Seq[String]): (DataFrame, Costs) = {
    val dir = java.nio.file.Files.createTempDirectory("repro-export-")
    val out = dir.resolve("wide.csv").toString
    val projected = wide.select(keepCols.map(org.apache.spark.sql.functions.col): _*)

    val t0 = System.nanoTime
    val cached = projected.cache()
    val rows = cached.count() // materialize the join
    val t1 = System.nanoTime
    cached.write.mode("overwrite").option("header", "true").csv(out) // export
    val t2 = System.nanoTime
    val loaded = spark.read.option("header", "true").option("inferSchema", "true").csv(out)
    loaded.cache().count() // load
    val t3 = System.nanoTime
    cached.unpersist(blocking = false)
    (loaded, Costs((t1 - t0) / 1000000, (t2 - t1) / 1000000, (t3 - t2) / 1000000, rows, keepCols.size))
  }
}
