package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Factorized semi-ring aggregation via message passing over the join graph
  * (paper §3.1/§3.3).
  *
  * A message `m_{child→parent}` joins `child` (filtered by the node's
  * predicates) with all incoming messages from its own children, multiplies
  * annotations (⊗), then group-bys the (child, parent) join keys summing the
  * annotation components (⊕). Absorption at a root relation computes
  * `γ_X(R⋈)` without materializing `R⋈`.
  */
final class MessagePassing(
    val graph: JoinGraph,
    val sr: Semiring,
    val cache: MessageCache,
    val metrics: Metrics = new Metrics,
) {

  /** Message from `child` toward `parent` under per-relation predicates. */
  def message(child: String, parent: String, preds: PredMap.T): DataFrame = {
    val key = cacheKey(child, parent, preds)
    cache.getOrCompute(key) {
      metrics.timeMessage {
        val incoming = graph.neighbors(child).filterNot(_ == parent)
        var df = filtered(child, preds)
        for (gc <- incoming)
          df = Ann.multiplyJoin(df, message(gc, child, preds), graph.keysBetween(gc, child), sr,
            broadcastRight = true)
        val keys = graph.keysBetween(child, parent)
        df.groupBy(keys.map(col): _*).agg(Ann.sumAggs(sr).head, Ann.sumAggs(sr).tail: _*)
      }
    }
  }

  /** Absorption: `γ_{groupCols}(R⋈)` with `groupCols` living in `root`.
    * Empty `groupCols` yields the single-row global aggregate `γ(R⋈)`.
    */
  def aggregate(root: String, groupCols: Seq[String], preds: PredMap.T): DataFrame = {
    var df = filtered(root, preds)
    for (nb <- graph.neighbors(root))
      df = Ann.multiplyJoin(df, message(nb, root, preds), graph.keysBetween(nb, root), sr,
        broadcastRight = true)
    if (groupCols.isEmpty) df.agg(Ann.sumAggs(sr).head, Ann.sumAggs(sr).tail: _*)
    else df.groupBy(groupCols.map(col): _*).agg(Ann.sumAggs(sr).head, Ann.sumAggs(sr).tail: _*)
  }

  /** Collected global aggregate as a component vector (zero if no rows). */
  def totals(root: String, preds: PredMap.T): Vector[Double] = {
    val row = aggregate(root, Seq.empty, preds).collect()(0)
    if (row.isNullAt(0)) sr.zeroV
    else sr.components.indices.map(i => row.getDouble(i)).toVector
  }

  private def filtered(name: String, preds: PredMap.T): DataFrame =
    preds.getOrElse(name, Nil).foldLeft(graph.rel(name))((d, p) => d.where(p.toCol))

  /** Cache key: directed edge + (version, predicate signature) of every
    * relation on the child's side — messages are root-choice independent, so
    * they are shared across the per-feature aggregation queries AND across
    * tree nodes whose subtree predicates coincide (paper §5.5.1).
    */
  private def cacheKey(child: String, parent: String, preds: PredMap.T): String = {
    val sub = graph.subtree(child, parent).toSeq.sorted
    val parts = sub.map(r => s"$r@${graph.version(r)}{${PredMap.sig(preds, r)}}")
    s"${sr.name}|$child->$parent|${parts.mkString(";")}"
  }
}
