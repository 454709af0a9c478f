package repro.core

import org.apache.spark.sql.functions._
import repro.{SparkSpec, TestFixtures}
import repro.baseline.{InMemoryGBDT, Materialize, WideTable}

/** Factorized gradient boosting (snowflake): residuals live only in the
  * semiring annotations; checked against explicit residual computation over
  * the materialized join and against the in-memory array GBDT (the paper's
  * "identical to LightGBM" property).
  */
class BoostingSpec extends SparkSpec {

  private lazy val ds = TestFixtures.star(spark, nFact = 1500, dimRows = 30).persist()

  private def boost(nTrees: Int, strategy: ResidualStrategy, leaves: Int = 4): BoostResult =
    new GradientBoosting(
      ds.annotated(), ds.yRelation, ds.clusters, ds.features,
      BoostParams(nTrees = nTrees, tree = TreeParams(maxLeaves = leaves)),
      strategy,
    ).train()

  test("boost-from-average base score equals mean(y)") {
    val res = boost(1, new MemSwap)
    val expected = Materialize.wide(ds).agg(avg(col(Materialize.wideTargetCol(ds)))).collect()(0).getDouble(0)
    assert(math.abs(res.model.baseScore - expected) < 1e-6 * math.abs(expected))
  }

  test("annotations after k updates equal explicit residual statistics on the wide table") {
    val res = boost(3, new MemSwap)
    val wide = Materialize.wide(ds)
    val yCol = Materialize.wideTargetCol(ds)
    val residual = col(yCol) - res.model.predictExpr(Joins.wideResolve)
    val expRow = wide.agg(
      count(lit(1)).cast("double"), sum(residual), sum(residual * residual)).collect()(0)

    val mp = new MessagePassing(res.finalGraph, VarianceSemiring, new MessageCache(CacheMode.Off))
    val got = mp.totals("sales", PredMap.empty)
    assert(math.abs(got(0) - expRow.getDouble(0)) < 1e-6)
    assert(math.abs(got(1) - expRow.getDouble(1)) < 1e-4 * math.max(1.0, math.abs(expRow.getDouble(1))))
    assert(math.abs(got(2) - expRow.getDouble(2)) < 1e-6 * math.max(1.0, math.abs(expRow.getDouble(2))))
  }

  test("factorized boosting produces the same trees as the in-memory GBDT") {
    val res = boost(3, new MemSwap)
    val table = WideTable.fromWide(Materialize.wide(ds), ds.features, Materialize.wideTargetCol(ds))
    val mem = new InMemoryGBDT(table, TreeParams(maxLeaves = 4)).boost(3, 0.1)
    assert(math.abs(res.model.baseScore - mem.baseScore) < 1e-6 * math.abs(mem.baseScore))
    assert(res.model.trees.size == mem.trees.size)
    res.model.trees.zip(mem.trees).zipWithIndex.foreach { case ((a, b), i) =>
      withClue(s"tree $i:") { TestFixtures.assertTreesEqual(a, b, 1e-5) }
    }
  }

  test("training rmse decreases over boosting iterations") {
    val wide = Materialize.wide(ds).localCheckpoint(true)
    val yCol = col(Materialize.wideTargetCol(ds))
    val res = boost(5, new MemSwap)
    val rmses = (0 to 5).map { k =>
      val partial = BoostedModel(res.model.baseScore, 0.1, res.model.trees.take(k))
      Boosting.rmse(wide, yCol, partial.predictExpr(Joins.wideResolve))
    }
    rmses.sliding(2).foreach { case Seq(a, b) => assert(b <= a + 1e-6, s"rmse increased: $rmses") }
    assert(rmses.last < rmses.head, "boosting should reduce training rmse")
  }

  test("all residual-update strategies produce the same model") {
    val reference = boost(2, new MemSwap)
    val strategies: Seq[ResidualStrategy] =
      Seq(new DiskCreate(spark), new NaiveJoin(spark), new SwapNarrow("sid"))
    for (s <- strategies) {
      val res = boost(2, s)
      withClue(s"strategy ${s.name}:") {
        assert(math.abs(res.model.baseScore - reference.model.baseScore) < 1e-6 * math.abs(reference.model.baseScore))
        reference.model.trees.zip(res.model.trees).foreach { case (a, b) =>
          TestFixtures.assertTreesEqual(a, b, 1e-5)
        }
      }
    }
  }

  test("iteration stats record one train+update pair per tree") {
    val res = boost(3, new MemSwap)
    assert(res.iters.size == 3)
    assert(res.iters.forall(_.cluster == "sales"))
    assert(res.iters.forall(i => i.trainMs >= 0 && i.updateMs >= 0))
  }

  test("single-leaf trees (no usable features) still update residuals consistently") {
    // constant target → first tree cannot split; boosting must not crash
    import org.apache.spark.sql.functions.lit
    val rels = ds.relations.updated("sales", ds.relations("sales").withColumn("y", lit(5.0)))
    val flat = ds.copy(relations = rels)
    val res = new GradientBoosting(
      flat.annotated(), "sales", flat.clusters, flat.features,
      BoostParams(nTrees = 2, tree = TreeParams(maxLeaves = 4)), new MemSwap,
    ).train()
    assert(math.abs(res.model.baseScore - 5.0) < 1e-9)
    res.model.trees.foreach(t => assert(t.numLeaves == 1))
    // after base subtraction residual is 0, so leaf predictions are 0
    res.model.trees.foreach(t => assert(math.abs(t.root.asInstanceOf[TLeaf].prediction) < 1e-9))
  }

  test("BoostedModel predictExpr equals driver-side predict") {
    val res = boost(2, new MemSwap)
    val wide = Materialize.wide(ds).limit(100)
    val cols = wide.columns
    wide.withColumn("__p", res.model.predictExpr(Joins.wideResolve)).collect().foreach { r =>
      val byName = cols.zipWithIndex.map { case (c, i) => c -> r.get(i) }.toMap
      val local = res.model.predict { f =>
        byName(s"${f.relation}__${f.column}") match {
          case i: Int => i.toDouble
          case l: Long => l.toDouble
          case other => other
        }
      }
      assert(math.abs(r.getAs[Double]("__p") - local) < 1e-9)
    }
  }
}
