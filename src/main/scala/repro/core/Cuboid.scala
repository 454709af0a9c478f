package repro.core

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._

/** Histogram-based cuboid optimization (paper Appendix D.3): bin every
  * numeric feature into `bins` equi-width buckets, GROUP BY all (binned)
  * feature attributes over R⋈, and keep only the aggregated semiring
  * annotations. Training — and, crucially, boosting residual updates — then
  * run entirely on the (much smaller) cuboid, because leaf predicates
  * reference only cuboid group-by columns.
  */
object Cuboid {

  final case class Built(
      /** single-relation join graph over the cuboid */
      graph: JoinGraph,
      /** features re-rooted onto the cuboid relation */
      features: Seq[Feature],
      /** cuboid rows (for reporting the size/shape tradeoff) */
      rows: Long,
      /** maps a cuboid-space model back to raw feature space */
      translate: TreeModel => TreeModel,
  )

  val RelName = "cuboid"

  /** Build the cuboid from an annotated join graph. Numeric features are
    * binned over their [min, max] range; categorical features group by their
    * raw value. `bins = 0` disables binning (full-resolution cuboid).
    */
  def build(graph: JoinGraph, features: Seq[Feature], bins: Int, sr: Semiring): Built = {
    val wide = Joins.materializeJoinAnnotated(graph, sr)
    val resolve = Joins.wideResolve

    // feature value ranges for equi-width binning, one scan
    val numeric = features.filter(_.kind == NumericF)
    val ranges: Map[Feature, (Double, Double)] =
      if (bins <= 0 || numeric.isEmpty) Map.empty
      else {
        val aggs = numeric.flatMap(f => Seq(
          min(resolve(f).cast("double")), max(resolve(f).cast("double"))))
        val row = wide.agg(aggs.head, aggs.tail: _*).collect()(0)
        numeric.zipWithIndex.map { case (f, i) =>
          f -> (row.getDouble(2 * i), row.getDouble(2 * i + 1))
        }.toMap
      }

    def binned(f: Feature): Column = ranges.get(f) match {
      case Some((lo, hi)) if hi > lo =>
        // bin id -> representative value (bin upper edge) so numeric split
        // thresholds in cuboid space are directly comparable to raw values
        val width = (hi - lo) / bins
        val id = least(lit(bins - 1), floor((resolve(f).cast("double") - lo) / width))
        (lit(lo) + (id + 1) * width).cast("double")
      case _ => resolve(f).cast(if (f.kind == NumericF) "double" else "string")
    }

    val groupCols = features.map(f => binned(f).as(s"${f.relation}__${f.column}"))
    val cuboid = wide
      .select(groupCols ++ sr.components.map(col): _*)
      .groupBy(features.map(f => col(s"${f.relation}__${f.column}")): _*)
      .agg(Ann.sumAggs(sr).head, Ann.sumAggs(sr).tail: _*)
      .cache()
    val n = cuboid.count()

    val cuboidFeatures = features.map(f => Feature(RelName, s"${f.relation}__${f.column}", f.kind))
    val back: Map[String, Feature] = features.map(f => s"${f.relation}__${f.column}" -> f).toMap

    def translateTree(t: TreeModel): TreeModel = {
      def walk(n: TNode): TNode = n match {
        case l: TLeaf => l
        case TSplit(f, v, l, r) => TSplit(back(f.column), v, walk(l), walk(r))
      }
      TreeModel(walk(t.root))
    }

    Built(JoinGraph.single(RelName, cuboid), cuboidFeatures, n, translateTree)
  }
}
