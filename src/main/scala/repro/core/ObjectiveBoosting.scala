package repro.core

import org.apache.spark.sql.functions._

/** Second-order gradient boosting for general objectives (mae, huber, fair,
  * …) via the gradient semiring — snowflake schemas only (paper §5.1: "other
  * objectives require snowflake schema").
  *
  * Because non-rmse objectives are not addition-to-multiplication
  * preserving, residuals cannot stay inside annotations; instead the 1-to-1
  * mapping between the fact table F and R⋈ (paper §4.1) is exploited: F
  * carries explicit `y` and running `pred` columns, and each iteration
  * (1) re-lifts (h, g) from the objective's gradients, (2) trains a
  * factorized tree on the gradient semiring, (3) updates `pred` on F with
  * the leaf predicates pushed down as semi-joins (attached dim features).
  */
final class ObjectiveBoosting(
    graph0: JoinGraph,
    factName: String,
    yCol: String,
    features: Seq[Feature],
    loss: Loss,
    params: BoostParams,
    beta: Double = 0.0,
    cacheMode: CacheMode = CacheMode.Shared,
    metrics: Metrics = new Metrics,
) {
  private val sr    = GradientSemiring
  private val cache = new MessageCache(cacheMode, metrics = metrics)

  private def treeParams = params.tree.copy(
    criterion = GainCriterion(beta),
    cComp = "__h",
    sComp = "__g",
  )

  def train(): BoostResult = {
    var graph = {
      val f0 = graph0.rel(factName).withColumn("__pred", lit(0.0))
      graph0.withRelation(factName, f0)
    }

    // boost from average of y (cheap global aggregate on F alone)
    val base =
      if (!params.boostFromAverage) 0.0
      else {
        val r = graph.rel(factName).agg(avg(col(yCol))).collect()(0).getDouble(0)
        graph = graph.withRelation(factName, graph.rel(factName).withColumn("__pred", lit(r)))
        r
      }

    val iters = Seq.newBuilder[IterStats]
    val trees = Seq.newBuilder[TreeModel]

    for (_ <- 1 to params.nTrees) {
      val t0 = System.nanoTime
      // (1) lift gradients into annotations
      val lifted = graph.rel(factName)
        .withColumn("__h", loss.hess(col(yCol), col("__pred")).cast("double"))
        .withColumn("__g", loss.grad(col(yCol), col("__pred")).cast("double"))
      var g = graph.withRelation(factName, lifted)
      // (2) train a factorized tree on (H, G)
      val mp   = new MessagePassing(g, sr, cache, metrics)
      val tree = new FactorizedTreeTrainer(mp, features, treeParams).train()
      val t1 = System.nanoTime
      // (3) advance predictions on F with pushed-down leaf predicates
      val dimFeatures      = tree.featuresUsed.filterNot(_.relation == factName)
      val (withF, resolve) = Joins.attachFeatures(g, factName, dimFeatures)
      val advanced = withF
        .withColumn("__pred", col("__pred") + tree.predictExpr(resolve) * params.learningRate)
        .select(lifted.columns.map(col).toSeq: _*)
        .drop("__h", "__g")
        .localCheckpoint(true)
      graph.rel(factName).unpersist(blocking = false)
      graph = g.withRelation(factName, advanced)
      val t2 = System.nanoTime
      trees += tree
      iters += IterStats((t1 - t0) / 1000000, (t2 - t1) / 1000000, factName)
    }
    BoostResult(BoostedModel(base, params.learningRate, trees.result()), iters.result(), graph)
  }
}
