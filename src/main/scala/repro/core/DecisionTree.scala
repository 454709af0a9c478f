package repro.core

import scala.collection.mutable

/** Training parameters shared by all trainers (defaults follow the paper's
  * experiment setup: best-first growth, 8 leaves).
  */
final case class TreeParams(
    maxLeaves: Int = 8,
    maxDepth: Int = 10,
    minLeaf: Double = 1.0,
    minGain: Double = 1e-12,
    criterion: RegCriterion = VarianceReduction,
    cComp: String = "__c",
    sComp: String = "__s",
    /** concurrent per-feature split queries (inter-query parallelism,
      * paper §5.5.3); deterministic — candidate order is preserved.
      */
    featureParallelism: Int = 4,
) {
  def splitParams: SplitFinder.Params =
    SplitFinder.Params(minLeaf = minLeaf, criterion = criterion, cComp = cComp, sComp = sComp)
}

/** Factorized decision-tree trainer — paper Algorithm 1 with best-first
  * growth. The expensive step (L14, best split per feature) runs as
  * factorized group-by aggregation queries through [[MessagePassing]];
  * work-sharing across nodes comes from the message cache.
  *
  * @param restrictAfterRoot CPT hook (paper §4.2.2): once the root split is
  *   chosen, maps the root's feature to the feature subset allowed in the
  *   rest of this tree.
  */
final class FactorizedTreeTrainer(
    mp: MessagePassing,
    features: Seq[Feature],
    params: TreeParams = TreeParams(),
    restrictAfterRoot: Option[Feature => Seq[Feature]] = None,
) {
  require(features.nonEmpty, "need at least one feature")

  private final class BNode(val preds: PredMap.T, val stats: Stats, val nodeDepth: Int) {
    var split: Option[(SplitCand, BNode, BNode)] = None
  }

  def train(): TreeModel = {
    val statsRoot = mp.graph.names.min
    val rootVec   = mp.totals(statsRoot, PredMap.empty)
    val rootStats = Stats(rootVec(0), rootVec(1))
    require(rootStats.c > 0, "empty training input")

    val root = new BNode(PredMap.empty, rootStats, 0)
    var activeFeatures = features
    var numLeaves      = 1
    var seq            = 0L

    // max-heap on criterion reduction, FIFO on ties for determinism
    implicit val ord: Ordering[(Double, Long, BNode, SplitCand)] =
      Ordering.by(t => (t._1, -t._2))
    val pq = mutable.PriorityQueue.empty[(Double, Long, BNode, SplitCand)]

    def enqueue(node: BNode): Unit =
      if (node.nodeDepth < params.maxDepth && node.stats.c >= 2 * params.minLeaf) {
        bestSplit(node, activeFeatures).foreach { cand =>
          if (cand.crit > params.minGain) { pq.enqueue((cand.crit, seq, node, cand)); seq += 1 }
        }
      }

    enqueue(root)
    while (numLeaves < params.maxLeaves && pq.nonEmpty) {
      val (_, _, node, cand) = pq.dequeue()
      val (pl, pr) = Predicate.forSplit(cand.feature, cand.value)
      val lNode = new BNode(PredMap.add(node.preds, cand.feature.relation, pl), cand.left, node.nodeDepth + 1)
      val rNode = new BNode(PredMap.add(node.preds, cand.feature.relation, pr), cand.right, node.nodeDepth + 1)
      node.split = Some((cand, lNode, rNode))
      numLeaves += 1
      if ((node eq root) && restrictAfterRoot.isDefined)
        activeFeatures = restrictAfterRoot.get(cand.feature)
      enqueue(lNode)
      enqueue(rNode)
    }
    TreeModel(freeze(root))
  }

  /** Paper Algorithm 1 L11-16: best split across features (fixed feature
    * order, strictly-greater wins — deterministic under parallelism).
    */
  private def bestSplit(node: BNode, feats: Seq[Feature]): Option[SplitCand] = {
    val cands = Scheduler.parMap(feats, params.featureParallelism) { f =>
      SplitFinder.best(mp, f, node.preds, node.stats, params.splitParams)
    }
    if (mp.cache.mode == CacheMode.PerNode) mp.cache.clear()
    cands.flatten.foldLeft(Option.empty[SplitCand]) { (best, c) =>
      if (best.forall(b => c.crit > b.crit)) Some(c) else best
    }
  }

  private def freeze(b: BNode): TNode = b.split match {
    case None                  => TLeaf(params.criterion.leafPrediction(b.stats), b.stats.c)
    case Some((cand, l, r))    => TSplit(cand.feature, cand.value, freeze(l), freeze(r))
  }
}
