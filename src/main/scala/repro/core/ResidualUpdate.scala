package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** A CPT cluster (paper §4.2.2): a fact table plus relations it reaches via
  * N-to-1 paths, so any predicate over member attributes can be pushed onto
  * the fact table without creating join-graph cycles. A snowflake schema is
  * the degenerate single cluster containing the whole graph.
  */
final case class Cluster(fact: String, members: Set[String]) {
  require(members.contains(fact), s"cluster members must include the fact table $fact")
}

/** Physical realization of one boosting residual update (paper §5.3–5.4).
  *
  * Logically every strategy computes the same thing: multiply the cluster
  * fact table's semiring annotations by `lift(-lr·p_leaf)` per tuple
  * (Proposition 4.1), with leaf predicates resolved on the fact table via
  * attached dimension features (semi-join pushdown). Strategies differ only
  * in how the updated table is materialized — the paper's point is that this
  * choice dominates gradient-boosting cost on columnar engines.
  */
trait ResidualStrategy {
  def name: String

  /** Returns the new, materialized fact DataFrame. */
  def update(graph: JoinGraph, cluster: Cluster, tree: TreeModel, lr: Double, sr: Semiring): DataFrame

  /** Compute the updated (un-materialized) fact table, original schema. */
  protected def updatedFact(graph: JoinGraph, cluster: Cluster, tree: TreeModel, lr: Double, sr: Semiring): DataFrame = {
    val fact = graph.rel(cluster.fact)
    val dimFeatures = tree.featuresUsed.filter(_.relation != cluster.fact)
    require(
      tree.featuresUsed.forall(f => cluster.members.contains(f.relation)),
      s"tree splits on features outside cluster ${cluster.fact}: ${tree.featuresUsed}",
    )
    val (withF, resolve) = Joins.attachFeatures(graph, cluster.fact, dimFeatures)
    val negP    = -tree.predictExpr(resolve) * lr
    val updated = Ann.multiplyBy(withF, sr.lift(negP), sr)
    updated.select(fact.columns.map(col).toSeq: _*) // drop attached dim columns
  }
}

/** Cached-DataFrame swap — the Spark analogue of the paper's column swap
  * (D-Swap): the new table is materialized into in-memory columnar batches
  * (no WAL, no CC, no disk), the old cache is dropped.
  */
final class MemSwap extends ResidualStrategy {
  val name = "mem-swap"
  def update(graph: JoinGraph, cluster: Cluster, tree: TreeModel, lr: Double, sr: Semiring): DataFrame = {
    val old = graph.rel(cluster.fact)
    // eager localCheckpoint = in-memory materialization with truncated
    // lineage: the new "projection" replaces the old one outright, and later
    // iterations don't re-analyze the whole update history
    val df = updatedFact(graph, cluster, tree, lr, sr).localCheckpoint(true)
    old.unpersist(blocking = false)
    df
  }
}

/** CREATE TABLE on a disk-based engine: the full updated fact table —
  * including all `k` payload columns — is written to parquet and re-read
  * (paper §5.3.1 CREATE / Fig 5 CREATE-k: cost grows with table width).
  */
final class DiskCreate(spark: SparkSession) extends ResidualStrategy {
  val name = "disk-create"
  private var lastDir: Option[java.nio.file.Path] = None

  def update(graph: JoinGraph, cluster: Cluster, tree: TreeModel, lr: Double, sr: Semiring): DataFrame =
    materializeDf(updatedFact(graph, cluster, tree, lr, sr))

  /** Write `df` to a fresh parquet dir and read it back (full rewrite). */
  private[core] def materializeDf(df: DataFrame): DataFrame = {
    val dir = java.nio.file.Files.createTempDirectory("repro-fact-")
    val out = dir.resolve("fact").toString
    df.write.mode("overwrite").parquet(out)
    val res = spark.read.parquet(out)
    res.count()
    lastDir.foreach(deleteRecursively)
    lastDir = Some(dir)
    res
  }

  private def deleteRecursively(p: java.nio.file.Path): Unit = {
    import scala.jdk.CollectionConverters._
    if (java.nio.file.Files.exists(p))
      java.nio.file.Files.walk(p).iterator.asScala.toSeq.reverse
        .foreach(java.nio.file.Files.deleteIfExists(_))
  }
}

/** The naive §4.2.1 scheme measured in the pilot study: materialize the
  * update relation U = π_A(R⋈) with the leaf predictions, join it back into
  * the fact table, and rewrite the whole table to disk.
  */
final class NaiveJoin(spark: SparkSession) extends ResidualStrategy {
  val name = "naive-join"
  private val disk = new DiskCreate(spark)

  def update(graph: JoinGraph, cluster: Cluster, tree: TreeModel, lr: Double, sr: Semiring): DataFrame = {
    val fact        = graph.rel(cluster.fact)
    val dimFeatures = tree.featuresUsed.filter(_.relation != cluster.fact)
    val (withF, resolve) = Joins.attachFeatures(graph, cluster.fact, dimFeatures)

    // U: distinct referenced-attribute combinations with -P (paper Fig 2b)
    val attachedNames = tree.featuresUsed.toSeq.sortBy(f => (f.relation, f.column))
      .map(f => if (f.relation == cluster.fact) f.column else s"${f.relation}__${f.column}")
    val u =
      if (attachedNames.isEmpty) withF.select(lit(1).as("__one")).limit(1)
        .withColumn("__negp", -tree.predictExpr(resolve) * lr)
      else withF.select(attachedNames.map(col): _*).distinct()
        .withColumn("__negp", -tree.predictExpr(f => col(
          if (f.relation == cluster.fact) f.column else s"${f.relation}__${f.column}")) * lr)
    u.cache(); u.count() // materialize U — the cost the paper's rewrite avoids

    val joined =
      if (attachedNames.isEmpty) withF.crossJoin(broadcast(u.select("__negp")))
      else withF.join(u, attachedNames, "inner")
    val updated = Ann.multiplyBy(joined, sr.lift(col("__negp")), sr)
      .select(fact.columns.map(col).toSeq: _*)
    val res = disk.materializeDf(updated)
    u.unpersist(blocking = false)
    res
  }
}

/** Narrow swap (the DP / DuckDB+Pandas analogue): the immutable payload
  * columns are cached once; only (rid, annotations) is re-materialized per
  * iteration. Updates are cheap and width-independent, but every training
  * query pays an extra rid-join — the paper's observed DP aggregation
  * slowdown.
  */
final class SwapNarrow(ridCol: String) extends ResidualStrategy {
  val name = s"swap-narrow($ridCol)"
  private var base: Option[DataFrame] = None

  def update(graph: JoinGraph, cluster: Cluster, tree: TreeModel, lr: Double, sr: Semiring): DataFrame = {
    val sel = updatedFact(graph, cluster, tree, lr, sr)
    val b = base.getOrElse {
      val comps = graph.rel(cluster.fact).columns.filterNot(sr.components.contains)
      val b0 = graph.rel(cluster.fact).select(comps.map(col).toSeq: _*).localCheckpoint(true)
      base = Some(b0)
      b0
    }
    val old = graph.rel(cluster.fact)
    val ann = sel.select((ridCol +: sr.components).map(col): _*).localCheckpoint(true)
    old.unpersist(blocking = false)
    b.join(ann, Seq(ridCol), "inner")
  }
}
