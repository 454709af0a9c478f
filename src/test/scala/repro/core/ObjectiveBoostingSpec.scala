package repro.core

import org.apache.spark.sql.functions._
import repro.{SparkSpec, TestFixtures}
import repro.baseline.Materialize

/** Gradient-semiring boosting for general objectives (paper Appendix B) —
  * snowflake only, with explicit prediction advancement on the fact table.
  */
class ObjectiveBoostingSpec extends SparkSpec {

  private lazy val ds = TestFixtures.star(spark, nFact = 1200, dimRows = 25).persist()

  private def run(loss: Loss, nTrees: Int, beta: Double = 0.0): BoostResult =
    new ObjectiveBoosting(
      ds.annotated(GradientSemiring), "sales", "y", ds.features, loss,
      BoostParams(nTrees = nTrees, tree = TreeParams(maxLeaves = 4)), beta,
    ).train()

  private def evalLoss(res: BoostResult, loss: Loss): Double = {
    val wide = Materialize.wide(ds)
    val yCol = col(Materialize.wideTargetCol(ds))
    wide.select(avg(loss.loss(yCol, res.model.predictExpr(Joins.wideResolve)))).collect()(0).getDouble(0)
  }

  private def baselineLoss(loss: Loss, base: Double): Double = {
    val wide = Materialize.wide(ds)
    val yCol = col(Materialize.wideTargetCol(ds))
    wide.select(avg(loss.loss(yCol, lit(base)))).collect()(0).getDouble(0)
  }

  test("L2 objective boosting matches variance-semiring boosting (same trees)") {
    val grad = run(L2Loss, 2)
    val vari = new GradientBoosting(
      ds.annotated(), "sales", ds.clusters, ds.features,
      BoostParams(nTrees = 2, tree = TreeParams(maxLeaves = 4)), new MemSwap,
    ).train()
    assert(math.abs(grad.model.baseScore - vari.model.baseScore) < 1e-6 * math.abs(vari.model.baseScore))
    grad.model.trees.zip(vari.model.trees).foreach { case (a, b) =>
      TestFixtures.assertTreesEqual(a, b, 1e-5)
    }
  }

  test("L1 (mae) objective reduces mean absolute error") {
    val res = run(L1Loss, 5)
    assert(evalLoss(res, L1Loss) < baselineLoss(L1Loss, res.model.baseScore))
  }

  test("huber objective reduces huber loss") {
    val loss = HuberLoss(delta = 100.0)
    val res = run(loss, 5)
    assert(evalLoss(res, loss) < baselineLoss(loss, res.model.baseScore))
  }

  test("fair loss objective reduces fair loss (scale-matched c)") {
    // fair loss needs c on the order of the residual scale; the star target
    // spans ~1e6, so rescale y to O(10) and use c = 5
    val scaled = ds.copy(relations = ds.relations.updated("sales",
      ds.relations("sales").withColumn("y", col("y") / 1e5)))
    val loss = FairLoss(c = 5.0)
    val res = new ObjectiveBoosting(
      scaled.annotated(GradientSemiring), "sales", "y", scaled.features, loss,
      BoostParams(nTrees = 5, tree = TreeParams(maxLeaves = 4)),
    ).train()
    val wide = Materialize.wide(scaled)
    val yCol = col(Materialize.wideTargetCol(scaled))
    val after = wide.select(avg(loss.loss(yCol, res.model.predictExpr(Joins.wideResolve)))).collect()(0).getDouble(0)
    val before = wide.select(avg(loss.loss(yCol, lit(res.model.baseScore)))).collect()(0).getDouble(0)
    assert(after < before, s"fair loss did not improve: $before -> $after")
  }

  test("L2 regularization beta shrinks leaf magnitudes") {
    val plain = run(L2Loss, 1, beta = 0.0)
    val reg   = run(L2Loss, 1, beta = 500.0)
    def maxLeaf(t: TreeModel): Double = t.leaves.map(l => math.abs(l._1.prediction)).max
    assert(maxLeaf(reg.model.trees.head) < maxLeaf(plain.model.trees.head))
  }

  test("loss column formulas match scalar expectations on sample points") {
    import spark.implicits._
    val df = Seq((3.0, 1.0), (0.0, 2.0), (-4.0, 0.0)).toDF("y", "p")
    val l2 = df.select(L2Loss.loss(col("y"), col("p"))).collect().map(_.getDouble(0)).toSeq
    assert(l2 == Seq(4.0, 4.0, 16.0))
    val l1g = df.select(L1Loss.grad(col("y"), col("p"))).collect().map(_.getDouble(0)).toSeq
    assert(l1g == Seq(1.0, -1.0, -1.0))
    val hub = df.select(HuberLoss(1.0).grad(col("y"), col("p"))).collect().map(_.getDouble(0)).toSeq
    assert(hub == Seq(1.0, -1.0, -1.0))
  }
}
