package repro.core

import org.apache.spark.sql.functions._
import repro.{SparkSpec, TestFixtures}
import repro.baseline.Materialize

/** Histogram cuboid (paper Appendix D.3): training over the GROUP-BY-all-
  * features cuboid must preserve semiring aggregates exactly at full
  * resolution and approximately under binning.
  */
class CuboidSpec extends SparkSpec {

  private lazy val ds = TestFixtures.star(spark, nFact = 1500, dimRows = 20).persist()

  test("full-resolution cuboid preserves global aggregates exactly") {
    val g = ds.annotated()
    val built = Cuboid.build(g, ds.features, bins = 0, VarianceSemiring)
    val mpC = new MessagePassing(built.graph, VarianceSemiring, new MessageCache(CacheMode.Off))
    val mpG = new MessagePassing(g, VarianceSemiring, new MessageCache(CacheMode.Off))
    val a = mpC.totals(Cuboid.RelName, PredMap.empty)
    val b = mpG.totals("sales", PredMap.empty)
    assert(math.abs(a(0) - b(0)) < 1e-6)
    assert(math.abs(a(1) - b(1)) < 1e-4 * math.max(1.0, math.abs(b(1))))
    assert(math.abs(a(2) - b(2)) < 1e-6 * math.abs(b(2)))
  }

  test("full-resolution cuboid trains the same tree as the factorized trainer") {
    val g = ds.annotated()
    val built = Cuboid.build(g, ds.features, bins = 0, VarianceSemiring)
    val mpC = new MessagePassing(built.graph, VarianceSemiring, new MessageCache(CacheMode.Shared))
    val mpG = new MessagePassing(g, VarianceSemiring, new MessageCache(CacheMode.Shared))
    val tc = built.translate(new FactorizedTreeTrainer(mpC, built.features, TreeParams(maxLeaves = 6)).train())
    val tg = new FactorizedTreeTrainer(mpG, ds.features, TreeParams(maxLeaves = 6)).train()
    TestFixtures.assertTreesEqual(tc, tg)
  }

  test("cuboid size shrinks with the bin count") {
    val g = ds.annotated()
    val full = Cuboid.build(g, ds.features, bins = 0, VarianceSemiring)
    val b10  = Cuboid.build(g, ds.features, bins = 10, VarianceSemiring)
    val b5   = Cuboid.build(g, ds.features, bins = 5, VarianceSemiring)
    assert(b5.rows <= b10.rows && b10.rows <= full.rows)
    assert(b5.rows < 1500, "binned cuboid should compress the fact table")
  }

  test("binned cuboid preserves count and sum exactly (only feature values are coarsened)") {
    val g = ds.annotated()
    val b5 = Cuboid.build(g, ds.features, bins = 5, VarianceSemiring)
    val mpC = new MessagePassing(b5.graph, VarianceSemiring, new MessageCache(CacheMode.Off))
    val mpG = new MessagePassing(g, VarianceSemiring, new MessageCache(CacheMode.Off))
    val a = mpC.totals(Cuboid.RelName, PredMap.empty)
    val b = mpG.totals("sales", PredMap.empty)
    assert(math.abs(a(0) - b(0)) < 1e-6 && math.abs(a(1) - b(1)) < 1e-4 * math.max(1.0, math.abs(b(1))))
  }

  test("boosting on the cuboid reduces rmse and residual updates stay on the cuboid") {
    val g = ds.annotated()
    val built = Cuboid.build(g, ds.features, bins = 8, VarianceSemiring)
    val cluster = Seq(Cluster(Cuboid.RelName, Set(Cuboid.RelName)))
    val res = new GradientBoosting(
      built.graph, Cuboid.RelName, cluster, built.features,
      BoostParams(nTrees = 4, tree = TreeParams(maxLeaves = 4)), new MemSwap,
    ).train()
    val model = BoostedModel(res.model.baseScore, res.model.learningRate, res.model.trees.map(built.translate))
    val wide = Materialize.wide(ds).localCheckpoint(true)
    val yCol = col(Materialize.wideTargetCol(ds))
    val r0 = Boosting.rmse(wide, yCol, lit(res.model.baseScore))
    val rK = Boosting.rmse(wide, yCol, model.predictExpr(Joins.wideResolve))
    assert(rK < r0, s"cuboid boosting did not improve rmse: $r0 -> $rK")
  }

  test("binned thresholds are representative raw-space values (bin upper edges)") {
    val g = ds.annotated()
    val b4 = Cuboid.build(g, ds.features, bins = 4, VarianceSemiring)
    val values = b4.graph.rel(Cuboid.RelName)
      .select(col(s"items__f_items")).distinct().collect().map(_.getDouble(0))
    assert(values.length <= 4)
    values.foreach(v => assert(v >= 1.0 && v <= 1000.5, s"bin edge $v outside raw range"))
  }
}
