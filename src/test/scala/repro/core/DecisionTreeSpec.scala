package repro.core

import org.apache.spark.sql.functions._
import repro.{SparkSpec, TestFixtures}
import repro.baseline.{InMemoryGBDT, Materialize, WideTable, WideTrainers}

/** The factorized trainer (Algorithm 1 over message passing) must produce
  * the same tree as (a) the non-factorized trainer over the materialized
  * wide table and (b) the in-memory array trainer — the paper's "returns
  * models identical to LightGBM" property.
  */
class DecisionTreeSpec extends SparkSpec {

  private lazy val ds = TestFixtures.star(spark, nFact = 2000, dimRows = 40).persist()

  private def factorizedTree(params: TreeParams, mode: CacheMode = CacheMode.Shared,
                             metrics: Metrics = new Metrics): TreeModel = {
    val g  = ds.annotated()
    val mp = new MessagePassing(g, VarianceSemiring, new MessageCache(mode, metrics = metrics), metrics)
    new FactorizedTreeTrainer(mp, ds.features, params).train()
  }

  private def inMemoryTree(params: TreeParams): TreeModel = {
    val wide  = Materialize.wide(ds)
    val table = WideTable.fromWide(wide, ds.features, Materialize.wideTargetCol(ds))
    new InMemoryGBDT(table, params).trainTree(Array.range(0, table.n), table.y, table.features.indices)
  }

  test("factorized tree == in-memory array tree (8 leaves)") {
    val params = TreeParams(maxLeaves = 8)
    TestFixtures.assertTreesEqual(factorizedTree(params), inMemoryTree(params))
  }

  test("factorized tree == in-memory array tree (16 leaves, depth 4)") {
    val params = TreeParams(maxLeaves = 16, maxDepth = 4)
    TestFixtures.assertTreesEqual(factorizedTree(params), inMemoryTree(params))
  }

  test("factorized tree == materialized wide-table tree") {
    val params = TreeParams(maxLeaves = 8)
    TestFixtures.assertTreesEqual(factorizedTree(params), WideTrainers.naiveTree(ds, params))
  }

  test("cache mode does not change the trained tree") {
    val params = TreeParams(maxLeaves = 4)
    val shared  = factorizedTree(params, CacheMode.Shared)
    val perNode = factorizedTree(params, CacheMode.PerNode)
    val off     = factorizedTree(params, CacheMode.Off)
    TestFixtures.assertTreesEqual(shared, perNode)
    TestFixtures.assertTreesEqual(shared, off)
  }

  test("feature parallelism does not change the trained tree") {
    val seqT = factorizedTree(TreeParams(maxLeaves = 4, featureParallelism = 1))
    val parT = factorizedTree(TreeParams(maxLeaves = 4, featureParallelism = 4))
    TestFixtures.assertTreesEqual(seqT, parT)
  }

  test("maxLeaves bounds the number of leaves") {
    for (m <- Seq(2, 4, 8)) {
      val t = factorizedTree(TreeParams(maxLeaves = m))
      assert(t.numLeaves <= m, s"maxLeaves=$m grew ${t.numLeaves}")
      assert(t.numLeaves >= 2, "should have split at least once on this data")
    }
  }

  test("maxDepth bounds the depth") {
    val t = factorizedTree(TreeParams(maxLeaves = 32, maxDepth = 2))
    assert(t.depth <= 2)
  }

  test("leaf counts sum to the dataset size and predictions are leaf means") {
    val t = factorizedTree(TreeParams(maxLeaves = 8))
    val totalCount = t.leaves.map(_._1.count).sum
    assert(math.abs(totalCount - 2000.0) < 1e-6)

    // verify each leaf's prediction against the wide table
    val wide = Materialize.wide(ds).cache()
    val yCol = Materialize.wideTargetCol(ds)
    try {
      for ((leaf, path) <- t.leaves) {
        val filt = path.foldLeft(wide) { case (df, (f, p)) =>
          df.where(predOnWide(f, p))
        }
        val row = filt.agg(count(lit(1)).cast("double"), avg(col(yCol))).collect()(0)
        assert(math.abs(row.getDouble(0) - leaf.count) < 1e-6, "leaf count mismatch")
        assert(math.abs(row.getDouble(1) - leaf.prediction) < 1e-6 * math.max(1.0, math.abs(leaf.prediction)),
          "leaf mean mismatch")
      }
    } finally { wide.unpersist(blocking = false); () }
  }

  test("predictExpr and driver predict agree on the wide table") {
    val t = factorizedTree(TreeParams(maxLeaves = 8))
    val wide = Materialize.wide(ds).limit(200)
    val withPred = wide.withColumn("__p", t.predictExpr(Joins.wideResolve)).collect()
    val cols = wide.columns
    withPred.foreach { r =>
      val byName = cols.zipWithIndex.map { case (c, i) => c -> r.get(i) }.toMap
      val local = t.predict(f => anyToDouble(byName(s"${f.relation}__${f.column}")))
      assert(math.abs(r.getAs[Double]("__p") - local) < 1e-9)
    }
  }

  test("variance reduction of the root split is maximal among features (spot check)") {
    val g  = ds.annotated()
    val mp = new MessagePassing(g, VarianceSemiring, new MessageCache(CacheMode.Shared))
    val tot = mp.totals("sales", PredMap.empty)
    val stats = Stats(tot(0), tot(1))
    val cands = ds.features.flatMap(f => SplitFinder.best(mp, f, PredMap.empty, stats))
    val t = factorizedTree(TreeParams(maxLeaves = 2))
    val rootCrit = t.root.asInstanceOf[TSplit]
    val bestCrit = cands.map(_.crit).max
    val chosen = cands.find(c => c.feature == rootCrit.feature).get
    assert(math.abs(chosen.crit - bestCrit) < 1e-9)
  }

  test("tree on categorical feature trains and routes every row to a leaf") {
    val dsc = TestFixtures.star(spark, nFact = 1000, dimRows = 20, includeCategorical = true).persist()
    val g  = dsc.annotated()
    val mp = new MessagePassing(g, VarianceSemiring, new MessageCache(CacheMode.Shared))
    val t  = new FactorizedTreeTrainer(mp, dsc.features, TreeParams(maxLeaves = 6)).train()
    assert(t.numLeaves >= 2)
    val leafCount = t.leaves.map(_._1.count).sum
    assert(math.abs(leafCount - 1000.0) < 1e-6)
  }

  test("metrics count split and message queries") {
    val metrics = new Metrics
    factorizedTree(TreeParams(maxLeaves = 4), CacheMode.Shared, metrics)
    val s = metrics.snapshot
    // 3 internal+leaf evaluation rounds: root + 2 children per split round
    assert(s.splitQueries > 0 && s.messageQueries > 0)
    assert(s.splitMs.size == s.splitQueries)
  }

  private def predOnWide(f: Feature, p: Predicate) = p match {
    case Le(_, v)    => col(s"${f.relation}__${f.column}").cast("double") <= v
    case Gt(_, v)    => col(s"${f.relation}__${f.column}").cast("double") > v
    case CatEq(_, v) => col(s"${f.relation}__${f.column}").cast("string") === v
    case CatNe(_, v) => col(s"${f.relation}__${f.column}").cast("string") =!= v
  }

  private def anyToDouble(a: Any): Any = a match {
    case i: Int    => i.toDouble
    case l: Long   => l.toDouble
    case d: Double => d
    case other     => other
  }
}
