package repro.core

import org.apache.spark.sql.functions._
import repro.{SparkSpec, TestFixtures}
import repro.baseline.Materialize

class RandomForestSpec extends SparkSpec {

  private lazy val ds = TestFixtures.star(spark, nFact = 1500, dimRows = 30).persist()

  private def forest(nTrees: Int, parallelism: Int = 1, seed: Long = 7): ForestModel =
    new RandomForest(
      ds.annotated(), "sales", ds.features,
      RFParams(nTrees = nTrees, sampleRate = 0.5, featureRate = 0.8, seed = seed,
        tree = TreeParams(maxLeaves = 4), treeParallelism = parallelism),
    ).train()

  test("trains the requested number of trees") {
    assert(forest(3).trees.size == 3)
  }

  test("same seed → identical forest; different seed → (almost surely) different") {
    val a = forest(2, seed = 7)
    val b = forest(2, seed = 7)
    a.trees.zip(b.trees).foreach { case (x, y) => TestFixtures.assertTreesEqual(x, y) }
    val c = forest(2, seed = 8)
    val same = a.trees.zip(c.trees).forall { case (x, y) => x.render == y.render }
    assert(!same, "different seeds produced identical forests")
  }

  test("tree-level parallelism does not change the forest") {
    val seqF = forest(3, parallelism = 1)
    val parF = forest(3, parallelism = 3)
    seqF.trees.zip(parF.trees).foreach { case (x, y) => TestFixtures.assertTreesEqual(x, y) }
  }

  test("feature sampling keeps ~featureRate of the features per tree") {
    val f = forest(4)
    val k = math.ceil(ds.features.size * 0.8).toInt
    f.trees.foreach { t =>
      assert(t.featuresUsed.size <= k, "tree used more features than its sample")
    }
  }

  test("row sampling trains on a fraction of the fact table") {
    val f = forest(1)
    // the tree's leaf counts sum to the sample size, ~50% of 1500
    val n = f.trees.head.leaves.map(_._1.count).sum
    assert(n > 400 && n < 1100, s"sampled size $n not ≈ 750")
  }

  test("forest prediction reduces rmse versus the constant mean") {
    val f = forest(8)
    val wide = Materialize.wide(ds).localCheckpoint(true)
    val yCol = col(Materialize.wideTargetCol(ds))
    val mean = wide.agg(avg(yCol)).collect()(0).getDouble(0)
    val rConst  = Boosting.rmse(wide, yCol, lit(mean))
    val rForest = Boosting.rmse(wide, yCol, f.predictExpr(Joins.wideResolve))
    assert(rForest < rConst, s"forest rmse $rForest not better than constant $rConst")
  }

  test("ForestModel averages tree predictions") {
    val t1 = TreeModel(TLeaf(2.0, 1))
    val t2 = TreeModel(TLeaf(4.0, 1))
    assert(ForestModel(Seq(t1, t2)).predict(_ => 0.0) == 3.0)
  }
}
