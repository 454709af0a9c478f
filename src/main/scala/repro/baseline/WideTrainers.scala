package repro.baseline

import org.apache.spark.sql.DataFrame
import repro.core._
import repro.data.Dataset

/** Trainers over the materialized wide table, built by plugging a
  * single-relation join graph into the factorized machinery (with one
  * relation there are no messages, so aggregation degrades to plain
  * group-bys over the wide table — exactly the non-factorized execution).
  */
object WideTrainers {

  val RelName = "wide"

  /** Single-relation annotated graph over the materialized join + features
    * re-rooted onto it + a mapping of trained trees back to raw features.
    */
  final case class WideGraph(graph: JoinGraph, features: Seq[Feature], translate: TreeModel => TreeModel)

  def annotatedSingle(ds: Dataset, cache: Boolean, sr: Semiring = VarianceSemiring): WideGraph = {
    val wide0 = Materialize.wide(ds)
    val lifted = Ann.lift(wide0, Materialize.wideTargetCol(ds), sr)
    val df = if (cache) { val c = lifted.cache(); c.count(); c } else lifted
    val feats = ds.features.map(f => Feature(RelName, s"${f.relation}__${f.column}", f.kind))
    val back  = ds.features.map(f => s"${f.relation}__${f.column}" -> f).toMap
    def translate(t: TreeModel): TreeModel = {
      def walk(n: TNode): TNode = n match {
        case l: TLeaf           => l
        case TSplit(f, v, l, r) => TSplit(back(f.column), v, walk(l), walk(r))
      }
      TreeModel(walk(t.root))
    }
    WideGraph(JoinGraph.single(RelName, df), feats, translate)
  }

  /** "Naive" of paper Fig 16a: materialize the join once (cached), then
    * train without any factorization or message sharing.
    */
  def naiveTree(ds: Dataset, params: TreeParams, metrics: Metrics = new Metrics): TreeModel = {
    val wg = annotatedSingle(ds, cache = true)
    val mp = new MessagePassing(wg.graph, VarianceSemiring, new MessageCache(CacheMode.Off), metrics)
    val t  = new FactorizedTreeTrainer(mp, wg.features, params).train()
    wg.graph.rel(RelName).unpersist(blocking = false)
    wg.translate(t)
  }

  /** MADLib stand-in (paper §6.4): non-factorized AND the join is
    * re-executed for every aggregation query (nothing is cached or shared).
    */
  def madlibTree(ds: Dataset, params: TreeParams, metrics: Metrics = new Metrics): TreeModel = {
    val wg = annotatedSingle(ds, cache = false)
    val mp = new MessagePassing(wg.graph, VarianceSemiring, new MessageCache(CacheMode.Off), metrics)
    wg.translate(new FactorizedTreeTrainer(mp, wg.features, params).train())
  }
}

/** Closer MADLib model (paper §6.4): the join is materialized once into a
  * table, then every split-candidate aggregation is evaluated by
  * row-at-a-time UDF-style execution (RDD of Rows, no vectorization, no
  * codegen) with no inter-query parallelism and no work sharing — the two
  * deficits the paper attributes MADLib's 16× gap to.
  */
final class MadlibLikeTrainer(ds: Dataset, params: TreeParams) {
  import org.apache.spark.rdd.RDD
  import org.apache.spark.sql.Row

  private val wide = Materialize.wide(ds)
  private val featNames = ds.features.filter(_.kind == NumericF)
    .map(f => (f, s"${f.relation}__${f.column}"))
  private val yName = Materialize.wideTargetCol(ds)

  /** (feature values..., y) rows, materialized once like MADLib's join
    * table. Single partition: PostgreSQL executes each aggregation query
    * single-threaded, which is part of the measured gap.
    */
  private val rows: RDD[Array[Double]] = {
    val cols = featNames.map(_._2) :+ yName
    wide.selectExpr(cols.map(c => s"cast(`$c` as double)"): _*)
      .rdd.map((r: Row) => Array.tabulate(cols.size)(r.getDouble)).coalesce(1).cache()
  }
  rows.count()

  def train(): TreeModel = {
    val nFeat = featNames.size

    // node predicate as data (featIdx, isLe, threshold) so RDD closures stay
    // serializable and capture no trainer state
    final class BNode(val conds: List[(Int, Boolean, Double)], val stats: Stats, val nodeDepth: Int) {
      var split: Option[(SplitCand, BNode, BNode)] = None
    }

    // row-at-a-time grouped aggregation, one full scan per (node, feature)
    def agg(node: BNode, j: Int): Seq[(Double, Double, Double)] = {
      val conds = node.conds
      rows.filter(a => conds.forall { case (jj, le, t) => if (le) a(jj) <= t else a(jj) > t })
        .map(a => (a(j), (1.0, a(nFeat))))
        .reduceByKey((x: (Double, Double), y: (Double, Double)) => (x._1 + y._1, x._2 + y._2))
        .collect().toSeq.map { case (v, (c, s)) => (v, c, s) }
    }

    def bestSplit(node: BNode): Option[SplitCand] = {
      var best: Option[SplitCand] = None
      for (j <- 0 until nFeat) { // sequential: MADLib has no query scheduler
        SplitFinder.bestNumericLocal(agg(node, j), node.stats, params.splitParams).foreach {
          case (v, crit, l, r) =>
            if (best.forall(b => crit > b.crit))
              best = Some(SplitCand(featNames(j)._1, NumThreshold(v), crit, l, r))
        }
      }
      best
    }

    val totals = rows.map(a => (1.0, a(nFeat)))
      .reduce((x: (Double, Double), y: (Double, Double)) => (x._1 + y._1, x._2 + y._2))
    val root = new BNode(Nil, Stats(totals._1, totals._2), 0)
    var numLeaves = 1
    var seq = 0L
    implicit val ord: Ordering[(Double, Long, BNode, SplitCand)] = Ordering.by(t => (t._1, -t._2))
    val pq = scala.collection.mutable.PriorityQueue.empty[(Double, Long, BNode, SplitCand)]

    def enqueue(n: BNode): Unit =
      if (n.nodeDepth < params.maxDepth && n.stats.c >= 2 * params.minLeaf)
        bestSplit(n).foreach { c =>
          if (c.crit > params.minGain) { pq.enqueue((c.crit, seq, n, c)); seq += 1 }
        }

    enqueue(root)
    while (numLeaves < params.maxLeaves && pq.nonEmpty) {
      val (_, _, node, cand) = pq.dequeue()
      val j = featNames.indexWhere(_._1 == cand.feature)
      val t = cand.value.asInstanceOf[NumThreshold].v
      val l = new BNode((j, true, t) :: node.conds, cand.left, node.nodeDepth + 1)
      val r = new BNode((j, false, t) :: node.conds, cand.right, node.nodeDepth + 1)
      node.split = Some((cand, l, r))
      numLeaves += 1
      enqueue(l); enqueue(r)
    }

    def freeze(b: BNode): TNode = b.split match {
      case None               => TLeaf(params.criterion.leafPrediction(b.stats), b.stats.c)
      case Some((cand, l, r)) => TSplit(cand.feature, cand.value, freeze(l), freeze(r))
    }
    val model = TreeModel(freeze(root))
    rows.unpersist(blocking = false)
    model
  }
}
