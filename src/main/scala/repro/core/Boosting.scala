package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Per-iteration timing record for the benches. */
final case class IterStats(trainMs: Long, updateMs: Long, cluster: String)

final case class BoostResult(model: BoostedModel, iters: Seq[IterStats], finalGraph: JoinGraph)

final case class BoostParams(
    nTrees: Int,
    learningRate: Double = 0.1,
    tree: TreeParams = TreeParams(),
    boostFromAverage: Boolean = true,
    /** Galaxy CPT scheduling: false = free root split, the cluster follows
      * the root's feature (§4.2.2); true = tree i is restricted up front to
      * cluster i mod k, cycling through every fact table (the training
      * pattern of paper Fig 14).
      */
    clusterRotation: Boolean = false,
)

/** Factorized gradient boosting with the rmse / variance semiring (paper §4).
  *
  * The target never exists as a materialized residual column of R⋈: it lives
  * only in the semiring annotations of the base relations. Each iteration
  * trains a factorized decision tree on the current annotations, then
  * multiplies the chosen cluster's fact-table annotations by
  * `lift(-lr·p_leaf)` (Proposition 4.1 — valid because the variance lift is
  * addition-to-multiplication preserving).
  *
  * Snowflake schemas pass a single [[Cluster]] covering the whole graph;
  * galaxy schemas pass one cluster per fact table and each tree is a
  * Clustered Predicate Tree: free root split, then features restricted to
  * the chosen cluster (§4.2.2).
  */
final class GradientBoosting(
    graph0: JoinGraph,
    yRelation: String,
    clusters: Seq[Cluster],
    features: Seq[Feature],
    params: BoostParams,
    strategy: ResidualStrategy,
    cacheMode: CacheMode = CacheMode.Shared,
    metrics: Metrics = new Metrics,
    sr: Semiring = VarianceSemiring,
) {
  require(clusters.nonEmpty, "need at least one cluster")
  require(
    features.forall(f => clusters.exists(_.members.contains(f.relation))),
    "every feature must belong to at least one cluster",
  )

  private val cache = new MessageCache(cacheMode, metrics = metrics)

  def train(): BoostResult = {
    var graph = graph0
    def mp(g: JoinGraph) = new MessagePassing(g, sr, cache, metrics)

    // boost from average: fold lift(-mean) into the Y relation's annotations
    val base =
      if (!params.boostFromAverage) 0.0
      else {
        val t = mp(graph).totals(yRelation, PredMap.empty)
        val mean = t(1) / t(0)
        val df = Ann.multiplyBy(graph.rel(yRelation), sr.lift(lit(-mean)), sr).localCheckpoint(true)
        graph.rel(yRelation).unpersist(blocking = false)
        graph = graph.withRelation(yRelation, df)
        mean
      }

    val iters = Seq.newBuilder[IterStats]
    val trees = Seq.newBuilder[TreeModel]

    for (i <- 1 to params.nTrees) {
      val chosen = new ClusterChoice(clusters, features)
      val rotated =
        if (params.clusterRotation && clusters.size > 1) Some(clusters((i - 1) % clusters.size))
        else None
      val treeFeatures = rotated match {
        case Some(c) => features.filter(f => c.members.contains(f.relation))
        case None    => features
      }
      val t0 = System.nanoTime
      val trainer = new FactorizedTreeTrainer(
        mp(graph), treeFeatures, params.tree,
        restrictAfterRoot =
          if (rotated.isEmpty && clusters.size > 1) Some(chosen.restrict) else None,
      )
      val tree = trainer.train()
      val t1 = System.nanoTime
      val cluster = rotated.getOrElse(chosen.clusterFor(tree))
      graph = graph.withRelation(cluster.fact, strategy.update(graph, cluster, tree, params.learningRate, sr))
      val t2 = System.nanoTime
      trees += tree
      iters += IterStats((t1 - t0) / 1000000, (t2 - t1) / 1000000, cluster.fact)
    }
    BoostResult(BoostedModel(base, params.learningRate, trees.result()), iters.result(), graph)
  }
}

/** CPT cluster selection: once the root split picks a feature, the cluster
  * becomes the one containing that feature's relation (ties broken toward
  * the cluster with most features, then by fact name) and the remaining
  * splits are restricted to its members' features.
  */
private final class ClusterChoice(clusters: Seq[Cluster], features: Seq[Feature]) {
  private var chosen: Option[Cluster] = None

  def restrict(rootFeature: Feature): Seq[Feature] = {
    val c = pick(rootFeature)
    chosen = Some(c)
    features.filter(f => c.members.contains(f.relation))
  }

  /** Cluster actually used (falls back to picking from the tree's root, or
    * the first cluster for an unsplit tree).
    */
  def clusterFor(tree: TreeModel): Cluster = chosen.getOrElse {
    tree.root match {
      case TSplit(f, _, _, _) => pick(f)
      case _                  => clusters.head
    }
  }

  private def pick(f: Feature): Cluster =
    clusters.filter(_.members.contains(f.relation))
      .sortBy(c => (-features.count(x => c.members.contains(x.relation)), c.fact))
      .headOption
      .getOrElse(sys.error(s"no cluster contains ${f.relation}"))
}

object Boosting {
  /** Lift the Y relation with `lift(y)` and every other relation with the
    * ⊗-identity, producing the annotated join graph training starts from.
    */
  def prepare(
      relations: Map[String, DataFrame],
      edges: Seq[Edge],
      yRelation: String,
      yCol: String,
      sr: Semiring = VarianceSemiring,
  ): JoinGraph = {
    val annotated = relations.map { case (name, df) =>
      name -> (if (name == yRelation) Ann.lift(df, yCol, sr) else Ann.one(df, sr))
    }
    JoinGraph(annotated, edges)
  }

  /** Root-mean-squared error of a model over a materialized evaluation join
    * (evaluation only — training never materializes R⋈).
    */
  def rmse(wide: DataFrame, yCol: org.apache.spark.sql.Column, predCol: org.apache.spark.sql.Column): Double = {
    val row = wide.select(sqrt(avg(pow(yCol - predCol, 2.0))).as("rmse")).collect()(0)
    row.getDouble(0)
  }
}
