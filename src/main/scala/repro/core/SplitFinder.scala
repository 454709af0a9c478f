package repro.core

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** (count-like, sum-like) sufficient statistics of a node / split side.
  * For the variance semiring these are (C, ΣY); for the gradient semiring
  * (ΣH, ΣG). Q / Σy² cancels out of the criterion (paper App. A) and is
  * never materialized during split finding.
  */
final case class Stats(c: Double, s: Double)

/** Regression split criterion = reduction of loss achieved by a split
  * (paper §3.3 / App. A and App. B.2). Both a Column form (evaluated inside
  * the best-split SQL query) and a scalar mirror (for the in-memory baseline
  * trainer) are provided; they use the same expression shape so the two
  * trainers produce bit-comparable models.
  */
trait RegCriterion extends Serializable {
  def critCol(cl: Column, sl: Column, cr: Column, sr: Column, total: Stats): Column
  def crit(cl: Double, sl: Double, cr: Double, sr: Double, total: Stats): Double
  def leafPrediction(st: Stats): Double
}

/** Reduction in variance: −S²/C + S_l²/C_l + S_r²/C_r (squares computed as
  * (s/c)·s to avoid overflow, as in paper Example 2).
  */
object VarianceReduction extends RegCriterion {
  def critCol(cl: Column, sl: Column, cr: Column, sr: Column, t: Stats): Column =
    lit(-(t.s / t.c) * t.s) + (sl / cl) * sl + (sr / cr) * sr
  def crit(cl: Double, sl: Double, cr: Double, sr: Double, t: Stats): Double =
    -(t.s / t.c) * t.s + (sl / cl) * sl + (sr / cr) * sr
  def leafPrediction(st: Stats): Double = st.s / st.c
}

/** Second-order gain −G²/(H+β) + G_l²/(H_l+β) + G_r²/(H_r+β) with L2
  * regularization β (paper App. B.2); leaf p* = G/(H+β).
  */
final case class GainCriterion(beta: Double = 0.0) extends RegCriterion {
  def critCol(cl: Column, sl: Column, cr: Column, sr: Column, t: Stats): Column =
    lit(-(t.s / (t.c + beta)) * t.s) + (sl / (cl + beta)) * sl + (sr / (cr + beta)) * sr
  def crit(cl: Double, sl: Double, cr: Double, sr: Double, t: Stats): Double =
    -(t.s / (t.c + beta)) * t.s + (sl / (cl + beta)) * sl + (sr / (cr + beta)) * sr
  def leafPrediction(st: Stats): Double = st.s / (st.c + beta)
}

/** Chosen split for a node: feature, split point, criterion reduction, and
  * the two sides' sufficient statistics (reused to seed the children, saving
  * one aggregation per child).
  */
final case class SplitCand(
    feature: Feature,
    value: SplitValue,
    crit: Double,
    left: Stats,
    right: Stats,
)

/** Finds the best split of one feature for one tree node, as a single SQL
  * query: group-by-feature aggregation (factorized, via message passing)
  * → window-function prefix sums → criterion → ORDER BY … LIMIT 1
  * (paper Example 2 / App. A).
  */
object SplitFinder {

  final case class Params(
      minLeaf: Double = 1.0,
      criterion: RegCriterion = VarianceReduction,
      cComp: String = "__c",
      sComp: String = "__s",
      /** evaluate prefix-sums/argmax in SQL (paper Example 2) instead of on
        * the collected per-value aggregate. Both paths are equivalent (see
        * SplitFinderSpec); the collected aggregate is bounded by the feature
        * cardinality, so the local path avoids one extra query plan.
        */
      sqlWindow: Boolean = false,
  )

  /** Best split of `feature` under the node's predicates, or None if no
    * valid split exists. `total` must be the node's (C,S) statistics.
    */
  def best(
      mp: MessagePassing,
      feature: Feature,
      preds: PredMap.T,
      total: Stats,
      params: Params = Params(),
  ): Option[SplitCand] = mp.metrics.timeSplit {
    val agg = mp.aggregate(feature.relation, Seq(feature.column), preds)
    (feature.kind, params.sqlWindow) match {
      case (NumericF, true)      => bestNumeric(agg, feature, total, params)
      case (NumericF, false)     =>
        val triples = agg
          .select(col(feature.column).cast("double"), col(params.cComp), col(params.sComp))
          .collect().toSeq.map(r => (r.getDouble(0), r.getDouble(1), r.getDouble(2)))
        bestNumericLocal(triples, total, params).map { case (v, crit, l, r) =>
          SplitCand(feature, NumThreshold(v), crit, l, r)
        }
      case (CategoricalF, true)  => bestCategorical(agg, feature, total, params)
      case (CategoricalF, false) =>
        val rows = agg
          .select(col(feature.column).cast("string"), col(params.cComp), col(params.sComp))
          .collect().toSeq.map(r => (r.getString(0), r.getDouble(1), r.getDouble(2)))
        var bestRes: Option[SplitCand] = None
        for ((v, cl, sl) <- rows.sortBy(_._1)) {
          val (cr, sr) = (total.c - cl, total.s - sl)
          if (cl >= params.minLeaf && cr >= params.minLeaf) {
            val crit = params.criterion.crit(cl, sl, cr, sr, total)
            if (bestRes.forall(b => crit > b.crit))
              bestRes = Some(SplitCand(feature, CatValue(v), crit, Stats(cl, sl), Stats(cr, sr)))
          }
        }
        bestRes
    }
  }

  private def bestNumeric(agg: DataFrame, f: Feature, total: Stats, p: Params): Option[SplitCand] = {
    val v  = col(f.column).cast("double").as("__v")
    val w  = Window.orderBy(col("__v"))
    val row = agg
      .select(v, col(p.cComp), col(p.sComp))
      .select(col("__v"), sum(p.cComp).over(w).as("__cl"), sum(p.sComp).over(w).as("__sl"))
      .withColumn("__cr", lit(total.c) - col("__cl"))
      .withColumn("__sr", lit(total.s) - col("__sl"))
      .where(col("__cl") >= p.minLeaf && col("__cr") >= p.minLeaf)
      .withColumn("__crit", p.criterion.critCol(col("__cl"), col("__sl"), col("__cr"), col("__sr"), total))
      .orderBy(desc("__crit"), asc("__v"))
      .limit(1)
      .collect()
    row.headOption.map { r =>
      SplitCand(
        f, NumThreshold(r.getDouble(0)), r.getDouble(5),
        Stats(r.getDouble(1), r.getDouble(2)),
        Stats(r.getDouble(3), r.getDouble(4)),
      )
    }
  }

  private def bestCategorical(agg: DataFrame, f: Feature, total: Stats, p: Params): Option[SplitCand] = {
    val row = agg
      .select(col(f.column).cast("string").as("__v"), col(p.cComp).as("__cl"), col(p.sComp).as("__sl"))
      .withColumn("__cr", lit(total.c) - col("__cl"))
      .withColumn("__sr", lit(total.s) - col("__sl"))
      .where(col("__cl") >= p.minLeaf && col("__cr") >= p.minLeaf)
      .withColumn("__crit", p.criterion.critCol(col("__cl"), col("__sl"), col("__cr"), col("__sr"), total))
      .orderBy(desc("__crit"), asc("__v"))
      .limit(1)
      .collect()
    row.headOption.map { r =>
      SplitCand(
        f, CatValue(r.getString(0)), r.getDouble(5),
        Stats(r.getDouble(1), r.getDouble(2)),
        Stats(r.getDouble(3), r.getDouble(4)),
      )
    }
  }

  /** Driver-side mirror of [[bestNumeric]] over (value, c, s) triples —
    * shared by the in-memory baseline so its split decisions match the SQL
    * path exactly. Input need not be sorted.
    */
  def bestNumericLocal(
      triples: Seq[(Double, Double, Double)],
      total: Stats,
      p: Params = Params(),
  ): Option[(Double, Double, Stats, Stats)] = {
    val sorted = triples.sortBy(_._1)
    var cl = 0.0; var sl = 0.0
    var best: Option[(Double, Double, Stats, Stats)] = None
    for ((v, c, s) <- sorted) {
      cl += c; sl += s
      val cr = total.c - cl
      val sr = total.s - sl
      if (cl >= p.minLeaf && cr >= p.minLeaf) {
        val crit = p.criterion.crit(cl, sl, cr, sr, total)
        if (best.forall(b => crit > b._2))
          best = Some((v, crit, Stats(cl, sl), Stats(cr, sr)))
      }
    }
    best
  }
}
