package repro.core

import org.apache.spark.sql.DataFrame
import scala.collection.mutable

/** Message-materialization policy (paper §3.3 / §5.5.1 / Fig 16a):
  *
  *  - [[CacheMode.Shared]]  — JoinBoost: messages are materialized
  *    (`cache()` + count) and re-used across *all* tree nodes whose subtree
  *    predicates match; this is the paper's key work-sharing contribution.
  *  - [[CacheMode.PerNode]] — the LMFAO-style "Batch" variant: messages are
  *    shared among the split queries of one node, then dropped.
  *  - [[CacheMode.Off]]     — no materialization at all: each aggregation is
  *    one fully-composed factorized query (aggregation pushdown still
  *    applies through Catalyst, but no work is shared).
  */
sealed trait CacheMode
object CacheMode {
  case object Shared  extends CacheMode
  case object PerNode extends CacheMode
  case object Off     extends CacheMode
}

/** LRU cache of materialized messages, keyed by
  * (directed edge, subtree predicate signature, relation versions).
  * Thread-safe: concurrent split queries for different features request
  * overlapping messages (paper §5.5.3 inter-query parallelism).
  */
final class MessageCache(val mode: CacheMode, maxEntries: Int = 512, metrics: Metrics = new Metrics) {

  private val entries = mutable.LinkedHashMap.empty[String, DataFrame]

  def getOrCompute(key: String)(compute: => DataFrame): DataFrame = mode match {
    case CacheMode.Off => compute
    case _ =>
      // Fast path under lock; computation (a Spark job) happens outside so
      // distinct messages materialize in parallel. A per-key latch would
      // dedupe concurrent same-key misses, but those are rare (feature
      // queries of one node mostly share already-cached messages).
      entries.synchronized(entries.get(key)) match {
        case Some(df) =>
          metrics.cacheHit()
          entries.synchronized { // refresh LRU position
            entries.remove(key).foreach(entries.put(key, _))
          }
          df
        case None =>
          metrics.cacheMiss()
          val df = materialize(compute)
          entries.synchronized {
            entries.put(key, df)
            while (entries.size > maxEntries) {
              val (k, old) = entries.head
              entries.remove(k)
              old.unpersist(blocking = false)
            }
          }
          df
      }
  }

  /** Materialize a message. Messages are aggregates bounded by the join-key
    * domain, so small ones are collected into driver-local relations: later
    * queries then build their broadcast hash tables without launching a
    * Spark sub-job per join (the dominant fixed cost otherwise). Large
    * messages fall back to a cached distributed DataFrame.
    */
  private def materialize(df: DataFrame): DataFrame = {
    import scala.jdk.CollectionConverters._
    val spark = df.sparkSession
    val rows  = df.limit(MessageCache.LocalizeLimit + 1).collect()
    if (rows.length <= MessageCache.LocalizeLimit)
      spark.createDataFrame(rows.toSeq.asJava, df.schema)
    else { val c = df.cache(); c.count(); c }
  }

  /** Drop everything (PerNode mode calls this between tree nodes). */
  def clear(): Unit = entries.synchronized {
    entries.values.foreach(_.unpersist(blocking = false))
    entries.clear()
  }

  def size: Int = entries.synchronized(entries.size)
}

object MessageCache {
  /** Messages up to this many rows are collected into driver-local
    * relations (broadcast-hash builds then cost no Spark job).
    */
  val LocalizeLimit: Int = 200000
}
