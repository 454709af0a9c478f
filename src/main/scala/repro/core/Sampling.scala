package repro.core

import org.apache.spark.sql.DataFrame
import scala.util.Random

/** General ancestral sampling over the non-materialized join (paper §5.5.2):
  * draw uniform tuples of R⋈ by walking the join graph from a root relation,
  * weighting each tuple by the COUNT-semiring aggregate of its subtree
  * (= the number of R⋈ rows it extends to).
  *
  * The weights are exactly the COUNT message-passing annotations; at the
  * scales where per-tuple sampling makes sense on a driver we evaluate them
  * on collected relations. Snowflake schemas should use the fact-table
  * sampling fast path in [[RandomForest]] instead.
  */
object Sampling {

  /** Sample `n` joined tuples (with replacement), each returned as a map
    * `rel__col -> value` across all relations.
    */
  def ancestral(graph: JoinGraph, root: String, n: Int, seed: Long): Seq[Map[String, Any]] = {
    val rnd  = new Random(seed)
    val rows: Map[String, Array[Map[String, Any]]] = graph.names.map { r =>
      val df   = graph.rel(r)
      val cols = df.columns
      r -> df.collect().map(row => cols.zipWithIndex.map { case (c, i) => c -> row.get(i) }.toMap)
    }.toMap

    // subtree weight of each tuple of `rel` looking away from `parent`
    val memo = scala.collection.mutable.Map.empty[(String, String), Array[Double]]
    def weights(rel: String, parent: String): Array[Double] =
      memo.getOrElseUpdate((rel, parent), {
        val children = graph.neighbors(rel).filterNot(_ == parent)
        val rs = rows(rel)
        val perChild: Seq[Array[Double]] = children.map { ch =>
          val keys = graph.keysBetween(rel, ch)
          val wch  = weights(ch, rel)
          val byKey = rows(ch).zip(wch).groupBy { case (t, _) => keys.map(t) }
            .map { case (k, ts) => k -> ts.map(_._2).sum }
          rs.map(t => byKey.getOrElse(keys.map(t), 0.0))
        }
        rs.indices.map(i => perChild.foldLeft(1.0)((acc, w) => acc * w(i))).toArray
      })

    def drawIndex(w: Array[Double]): Int = {
      val total = w.sum
      require(total > 0, "empty join — nothing to sample")
      var x = rnd.nextDouble() * total
      var i = 0
      while (i < w.length - 1 && x >= w(i)) { x -= w(i); i += 1 }
      while (w(i) == 0) i -= 1 // guard against fp edge landing on a 0-weight slot
      i
    }

    (1 to n).map { _ =>
      val out = scala.collection.mutable.Map.empty[String, Any]
      def descend(rel: String, parent: String, constraint: Map[String, Any]): Unit = {
        val rs   = rows(rel)
        val wAll = weights(rel, parent)
        val idxs = rs.indices.filter(i => constraint.forall { case (k, v) => rs(i)(k) == v })
        val w    = idxs.map(wAll).toArray
        val pick = idxs(drawIndex(w))
        rs(pick).foreach { case (c, v) => out(s"${rel}__$c") = v }
        for (ch <- graph.neighbors(rel).filterNot(_ == parent)) {
          val keys = graph.keysBetween(rel, ch)
          descend(ch, rel, keys.map(k => k -> rs(pick)(k)).toMap)
        }
      }
      descend(root, "", Map.empty)
      out.toMap
    }
  }

  /** Marginal probability table P(A) = γ_{A,count(*)}/C over R⋈, computed
    * factorized (used by tests to validate the sampler).
    */
  def marginal(mp: MessagePassing, relation: String, attr: String): Map[Any, Double] = {
    val agg = mp.aggregate(relation, Seq(attr), PredMap.empty).collect()
    val total = agg.map(_.getDouble(1)).sum
    agg.map(r => r.get(0) -> r.getDouble(1) / total).toMap
  }
}
