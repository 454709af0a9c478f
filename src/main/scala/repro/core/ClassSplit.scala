package repro.core

import scala.collection.mutable

/** Classification criteria over the class-count semiring (paper Table 1 /
  * Appendix A): gini impurity, information gain (entropy), chi-square.
  * Aggregated class counts per feature value are tiny, so prefix sums and
  * argmax run on the driver; the heavy lifting (γ_X over R⋈) remains the
  * factorized aggregation query.
  */
object ClassSplit {

  sealed trait ClassCriterion extends Serializable {
    def name: String
    /** criterion value of a candidate split: larger is better. counts(0) is
      * the total, counts(i) class i; `l`/`r` are the two sides.
      */
    def score(l: Vector[Double], r: Vector[Double]): Double
  }

  /** Reduction in weighted gini impurity. */
  case object Gini extends ClassCriterion {
    val name = "gini"
    def score(l: Vector[Double], r: Vector[Double]): Double = {
      val t = l.lazyZip(r).map(_ + _).toVector
      imp(t) - (l(0) / t(0)) * imp(l) - (r(0) / t(0)) * imp(r)
    }
    private def imp(c: Vector[Double]): Double =
      if (c(0) <= 0) 0.0 else 1.0 - c.tail.map(ci => (ci / c(0)) * (ci / c(0))).sum
  }

  /** Information gain (reduction in entropy). */
  case object Entropy extends ClassCriterion {
    val name = "entropy"
    def score(l: Vector[Double], r: Vector[Double]): Double = {
      val t = l.lazyZip(r).map(_ + _).toVector
      imp(t) - (l(0) / t(0)) * imp(l) - (r(0) / t(0)) * imp(r)
    }
    private def imp(c: Vector[Double]): Double =
      if (c(0) <= 0) 0.0
      else -c.tail.filter(_ > 0).map { ci => val p = ci / c(0); p * math.log(p) }.sum
  }

  /** Chi-square statistic of the split (paper Appendix A). */
  case object ChiSquare extends ClassCriterion {
    val name = "chi2"
    def score(l: Vector[Double], r: Vector[Double]): Double = {
      val t = l.lazyZip(r).map(_ + _).toVector
      (1 until t.size).map { i =>
        val el = t(i) * l(0) / t(0)
        val er = t(i) * r(0) / t(0)
        (if (el > 0) (l(i) - el) * (l(i) - el) / el else 0.0) +
          (if (er > 0) (r(i) - er) * (r(i) - er) / er else 0.0)
      }.sum
    }
  }

  /** Best split of `feature` for a classification node. `total` is the
    * node's aggregated class-count vector.
    */
  def best(
      mp: MessagePassing,
      feature: Feature,
      preds: PredMap.T,
      total: Vector[Double],
      criterion: ClassCriterion,
      minLeaf: Double = 1.0,
  ): Option[(SplitValue, Double, Vector[Double], Vector[Double])] = mp.metrics.timeSplit {
    val k = mp.sr.components.size
    val rows = mp.aggregate(feature.relation, Seq(feature.column), preds).collect()
      .map(r => (r.get(0), Vector.tabulate(k)(i => r.getDouble(i + 1))))

    def cands: Seq[(SplitValue, Vector[Double])] = feature.kind match {
      case NumericF =>
        val sorted = rows.sortBy(r => anyToDouble(r._1))
        var acc = Vector.fill(k)(0.0)
        sorted.toSeq.map { case (v, c) =>
          acc = acc.lazyZip(c).map(_ + _).toVector
          (NumThreshold(anyToDouble(v)), acc)
        }
      case CategoricalF =>
        rows.toSeq.sortBy(_._1.toString).map { case (v, c) => (CatValue(v.toString), c) }
    }

    var bestRes: Option[(SplitValue, Double, Vector[Double], Vector[Double])] = None
    for ((sv, l) <- cands) {
      val r = total.lazyZip(l).map(_ - _).toVector
      if (l(0) >= minLeaf && r(0) >= minLeaf) {
        val s = criterion.score(l, r)
        if (bestRes.forall(b => s > b._2)) bestRes = Some((sv, s, l, r))
      }
    }
    bestRes
  }

  private def anyToDouble(a: Any): Double = a match {
    case d: Double => d
    case f: Float  => f.toDouble
    case i: Int    => i.toDouble
    case l: Long   => l.toDouble
    case s: Short  => s.toDouble
    case other     => other.toString.toDouble
  }
}

/** Minimal factorized classification tree (best-first, like Algorithm 1)
  * predicting the majority class per leaf. Demonstrates that the class-count
  * semiring plugs into the same message-passing machinery.
  */
final class ClassificationTreeTrainer(
    mp: MessagePassing,
    features: Seq[Feature],
    criterion: ClassSplit.ClassCriterion = ClassSplit.Gini,
    maxLeaves: Int = 8,
    maxDepth: Int = 10,
    minLeaf: Double = 1.0,
    minGain: Double = 1e-12,
) {
  private val k = mp.sr.components.size

  private final class BNode(val preds: PredMap.T, val counts: Vector[Double], val nodeDepth: Int) {
    var split: Option[(Feature, SplitValue, BNode, BNode)] = None
  }

  def train(): TreeModel = {
    val rootRow = mp.aggregate(mp.graph.names.min, Seq.empty, PredMap.empty).collect()(0)
    val rootCounts = Vector.tabulate(k)(i => rootRow.getDouble(i))
    val root = new BNode(PredMap.empty, rootCounts, 0)
    var numLeaves = 1
    var seq = 0L
    implicit val ord: Ordering[(Double, Long, BNode, Feature, SplitValue, Vector[Double], Vector[Double])] =
      Ordering.by(t => (t._1, -t._2))
    val pq = mutable.PriorityQueue
      .empty[(Double, Long, BNode, Feature, SplitValue, Vector[Double], Vector[Double])]

    def enqueue(node: BNode): Unit =
      if (node.nodeDepth < maxDepth && node.counts(0) >= 2 * minLeaf) {
        val candidates = features.flatMap { f =>
          ClassSplit.best(mp, f, node.preds, node.counts, criterion, minLeaf).map {
            case (sv, s, l, r) => (f, sv, s, l, r)
          }
        }
        candidates.foldLeft(Option.empty[(Feature, SplitValue, Double, Vector[Double], Vector[Double])]) {
          (best, c) => if (best.forall(b => c._3 > b._3)) Some(c) else best
        }.foreach { case (f, sv, s, l, r) =>
          if (s > minGain) { pq.enqueue((s, seq, node, f, sv, l, r)); seq += 1 }
        }
      }

    enqueue(root)
    while (numLeaves < maxLeaves && pq.nonEmpty) {
      val (_, _, node, f, sv, l, r) = pq.dequeue()
      val (pl, pr) = Predicate.forSplit(f, sv)
      val ln = new BNode(PredMap.add(node.preds, f.relation, pl), l, node.nodeDepth + 1)
      val rn = new BNode(PredMap.add(node.preds, f.relation, pr), r, node.nodeDepth + 1)
      node.split = Some((f, sv, ln, rn))
      numLeaves += 1
      enqueue(ln); enqueue(rn)
    }

    def freeze(b: BNode): TNode = b.split match {
      case None =>
        val cls = (1 until k).maxBy(i => (b.counts(i), -i)) // majority class, ties to smaller id
        TLeaf(cls.toDouble, b.counts(0))
      case Some((f, sv, l, r)) => TSplit(f, sv, freeze(l), freeze(r))
    }
    TreeModel(freeze(root))
  }
}
