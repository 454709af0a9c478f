package repro.baseline

import org.apache.spark.sql.DataFrame
import repro.core._
import scala.collection.mutable
import scala.util.Random

/** Column-major in-memory training table (the "C++ arrays" of a specialized
  * ML library). Numeric features only, as LightGBM-style libraries see
  * dictionary-encoded integers anyway (paper §6 preprocessing).
  */
final class WideTable(
    val features: Array[Feature],
    val cols: Array[Array[Double]],
    val y: Array[Double],
) {
  def n: Int = y.length
}

object WideTable {
  /** Collect a wide DataFrame (columns named `rel__col`) to driver arrays. */
  def fromWide(df: DataFrame, features: Seq[Feature], targetCol: String): WideTable = {
    val numeric = features.filter(_.kind == NumericF).toArray
    val colNames = numeric.map(f => s"${f.relation}__${f.column}") :+ targetCol
    val rows = df.selectExpr(colNames.map(c => s"cast(`$c` as double)").toIndexedSeq: _*).collect()
    val n = rows.length
    val cols = Array.fill(numeric.length)(new Array[Double](n))
    val y = new Array[Double](n)
    var i = 0
    while (i < n) {
      val r = rows(i)
      var j = 0
      while (j < numeric.length) { cols(j)(i) = r.getDouble(j); j += 1 }
      y(i) = r.getDouble(numeric.length)
      i += 1
    }
    new WideTable(numeric, cols, y)
  }
}

/** The specialized-ML-library stand-in (LightGBM/XGBoost substitute, see
  * DESIGN.md): single-table, driver-side, array-based GBDT with exact-greedy
  * best-first growth. It uses the *same* criterion mirror and tie-breaking
  * as the factorized trainer, so — like LightGBM vs JoinBoost in the
  * paper — both produce identical models on the same data.
  */
final class InMemoryGBDT(table: WideTable, params: TreeParams = TreeParams()) {

  private val sp = params.splitParams
  private val fIdx: Map[Feature, Int] = table.features.zipWithIndex.toMap

  /** Train one tree on `target` restricted to `rowIdx`, using `featIdx`. */
  def trainTree(rowIdx: Array[Int], target: Array[Double], featIdx: Seq[Int]): TreeModel = {
    final class BNode(val rows: Array[Int], val stats: Stats, val nodeDepth: Int) {
      var split: Option[(SplitCand, BNode, BNode)] = None
    }

    def statsOf(rows: Array[Int]): Stats = {
      var s = 0.0; var i = 0
      while (i < rows.length) { s += target(rows(i)); i += 1 }
      Stats(rows.length.toDouble, s)
    }

    def bestSplit(node: BNode): Option[SplitCand] = {
      var best: Option[SplitCand] = None
      for (j <- featIdx) {
        val colv = table.cols(j)
        val groups = mutable.HashMap.empty[Double, (Double, Double)]
        var i = 0
        while (i < node.rows.length) {
          val r = node.rows(i)
          val v = colv(r)
          val (c, s) = groups.getOrElse(v, (0.0, 0.0))
          groups.update(v, (c + 1.0, s + target(r)))
          i += 1
        }
        val triples = groups.iterator.map { case (v, (c, s)) => (v, c, s) }.toSeq
        SplitFinder.bestNumericLocal(triples, node.stats, sp).foreach { case (v, crit, l, r) =>
          if (best.forall(b => crit > b.crit))
            best = Some(SplitCand(table.features(j), NumThreshold(v), crit, l, r))
        }
      }
      best
    }

    val root = new BNode(rowIdx, statsOf(rowIdx), 0)
    var numLeaves = 1
    var seq = 0L
    implicit val ord: Ordering[(Double, Long, BNode, SplitCand)] = Ordering.by(t => (t._1, -t._2))
    val pq = mutable.PriorityQueue.empty[(Double, Long, BNode, SplitCand)]

    def enqueue(node: BNode): Unit =
      if (node.nodeDepth < params.maxDepth && node.stats.c >= 2 * params.minLeaf)
        bestSplit(node).foreach { cand =>
          if (cand.crit > params.minGain) { pq.enqueue((cand.crit, seq, node, cand)); seq += 1 }
        }

    enqueue(root)
    while (numLeaves < params.maxLeaves && pq.nonEmpty) {
      val (_, _, node, cand) = pq.dequeue()
      val j = fIdx(cand.feature)
      val t = cand.value.asInstanceOf[NumThreshold].v
      val (lRows, rRows) = node.rows.partition(r => table.cols(j)(r) <= t)
      val lNode = new BNode(lRows, cand.left, node.nodeDepth + 1)
      val rNode = new BNode(rRows, cand.right, node.nodeDepth + 1)
      node.split = Some((cand, lNode, rNode))
      numLeaves += 1
      enqueue(lNode); enqueue(rNode)
    }

    def freeze(b: BNode): TNode = b.split match {
      case None               => TLeaf(params.criterion.leafPrediction(b.stats), b.stats.c)
      case Some((cand, l, r)) => TSplit(cand.feature, cand.value, freeze(l), freeze(r))
    }
    TreeModel(freeze(root))
  }

  /** Gradient boosting on the residual array (LightGBM-style: residual
    * updates are parallel writes to a flat array — the paper's 0.2 s
    * reference line in Fig 5).
    */
  def boost(nTrees: Int, lr: Double, boostFromAverage: Boolean = true): BoostedModel = {
    val n = table.n
    val all = Array.range(0, n)
    val residual = table.y.clone()
    val base = if (boostFromAverage) residual.sum / n else 0.0
    if (boostFromAverage) { var i = 0; while (i < n) { residual(i) -= base; i += 1 } }
    val trees = Seq.newBuilder[TreeModel]
    val featIdx = table.features.indices
    for (_ <- 1 to nTrees) {
      val tree = trainTree(all, residual, featIdx)
      trees += tree
      InMemoryGBDT.parallelResidualUpdate(residual, i =>
        tree.predict(f => table.cols(fIdx(f))(i)) * lr)
    }
    BoostedModel(base, lr, trees.result())
  }

  /** Random forest with the same per-tree feature bags as the factorized
    * [[RandomForest]] (rows are sampled independently — the two engines
    * draw rows through different RNG paths).
    */
  def forest(nTrees: Int, sampleRate: Double, featureRate: Double, seed: Long, parallelism: Int = 1): ForestModel = {
    val trees = Scheduler.parMap(0 until nTrees, parallelism) { t =>
      val rnd  = new Random(seed * 1031 + t)
      val rows = Array.range(0, table.n).filter(_ => rnd.nextDouble() < sampleRate)
      val bag  = RandomForest.featureBag(table.features.toSeq, featureRate, seed, t).toSet
      val featIdx = table.features.indices.filter(j => bag(table.features(j)))
      trainTree(rows, table.y, featIdx)
    }
    ForestModel(trees)
  }

  def rmse(model: BoostedModel): Double = {
    var sum = 0.0
    var i = 0
    while (i < table.n) {
      val p = model.predict(f => table.cols(fIdx(f))(i))
      sum += (table.y(i) - p) * (table.y(i) - p)
      i += 1
    }
    math.sqrt(sum / table.n)
  }
}

object InMemoryGBDT {
  /** Parallel write of per-row deltas into a flat array — the reference
    * "LightGBM residual update" cost for the T8 microbench.
    */
  def parallelResidualUpdate(residual: Array[Double], delta: Int => Double): Long = {
    val t0 = System.nanoTime
    val n  = residual.length
    val threads = math.max(1, Runtime.getRuntime.availableProcessors)
    val chunk = (n + threads - 1) / threads
    Scheduler.parMap(0 until threads, threads) { t =>
      var i = t * chunk
      val end = math.min(n, i + chunk)
      while (i < end) { residual(i) -= delta(i); i += 1 }
      ()
    }
    (System.nanoTime - t0) / 1000000
  }
}
