package repro.core

import org.apache.spark.sql.functions._
import repro.{SparkSpec, TestFixtures}

/** Galaxy-schema boosting via Clustered Predicate Trees (paper §4.2):
  * residual updates multiply `lift(-lr·p)` into the chosen cluster's fact
  * table annotations (Proposition 4.1). Verified against explicit residual
  * tracking over the materialized M-N join.
  */
class GalaxySpec extends SparkSpec {

  private lazy val ds = TestFixtures.galaxy(spark, nCast = 600, nEntity = 40, infoPer = 3).persist()

  private def boost(nTrees: Int): BoostResult =
    new GradientBoosting(
      ds.annotated(), ds.yRelation, ds.clusters, ds.features,
      BoostParams(nTrees = nTrees, tree = TreeParams(maxLeaves = 4)),
      new MemSwap,
    ).train()

  test("galaxy join blows up: |R⋈| >> |cast_info|") {
    val g = JoinGraph(ds.relations, ds.edges)
    val wideCount = Joins.materializeJoin(g).count()
    val castCount = ds.relations("cast_info").count()
    assert(wideCount == castCount * 3 * 3, "each cast row multiplies by infoPerPerson × infoPerMovie")
  }

  test("clusters satisfy the CPT shape (fact + members reachable N-to-1)") {
    for (c <- ds.clusters) {
      assert(c.members.contains(c.fact))
      val g = JoinGraph(ds.relations, ds.edges)
      // every member lies on a path from the fact inside the cluster
      for (m <- c.members - c.fact)
        assert(g.path(c.fact, m).toSet.subsetOf(c.members), s"path to $m leaves cluster ${c.fact}")
    }
  }

  test("Proposition 4.1: factorized aggregates equal explicit residual aggregates after 3 trees") {
    val res = boost(3)
    val rawWide = Joins.materializeJoin(JoinGraph(ds.relations, ds.edges))
    val residual = col(s"cast_info__y") - res.model.predictExpr(Joins.wideResolve)
    val exp = rawWide.agg(
      count(lit(1)).cast("double"), sum(residual), sum(residual * residual)).collect()(0)

    val mp = new MessagePassing(res.finalGraph, VarianceSemiring, new MessageCache(CacheMode.Off))
    val got = mp.totals("cast_info", PredMap.empty)
    assert(math.abs(got(0) - exp.getDouble(0)) < 1e-6)
    assert(math.abs(got(1) - exp.getDouble(1)) < 1e-4 * math.max(1.0, math.abs(exp.getDouble(1))))
    assert(math.abs(got(2) - exp.getDouble(2)) < 1e-6 * math.max(1.0, math.abs(exp.getDouble(2))))
  }

  test("Proposition 4.1 holds for grouped aggregates too (per-feature)") {
    val res = boost(2)
    val rawWide = Joins.materializeJoin(JoinGraph(ds.relations, ds.edges))
    val residual = col(s"cast_info__y") - res.model.predictExpr(Joins.wideResolve)
    val f = Feature("person", "p_f")
    val exp = rawWide.groupBy(col("person__p_f").cast("double").as("v"))
      .agg(sum(residual).as("s"), count(lit(1)).cast("double").as("c"))
      .collect().map(r => r.getDouble(0) -> (r.getDouble(2), r.getDouble(1))).toMap

    val mp = new MessagePassing(res.finalGraph, VarianceSemiring, new MessageCache(CacheMode.Off))
    val got = mp.aggregate(f.relation, Seq(f.column), PredMap.empty)
      .select(col(f.column).cast("double"), col("__c"), col("__s"))
      .collect().map(r => r.getDouble(0) -> (r.getDouble(1), r.getDouble(2))).toMap
    assert(got.keySet == exp.keySet)
    for ((k, (c, s)) <- exp) {
      assert(math.abs(got(k)._1 - c) < 1e-6, s"count at $k")
      assert(math.abs(got(k)._2 - s) < 1e-4 * math.max(1.0, math.abs(s)), s"sum at $k")
    }
  }

  test("CPT: every tree's non-root splits stay inside one cluster") {
    val res = boost(5)
    for ((tree, it) <- res.model.trees.zip(res.iters)) {
      val cluster = ds.clusters.find(_.fact == it.cluster).get
      assert(tree.featuresUsed.forall(f => cluster.members.contains(f.relation)),
        s"tree uses ${tree.featuresUsed} outside cluster ${cluster.fact}:\n${tree.render}")
    }
  }

  test("cluster rotation cycles through every fact table and stays consistent (Prop 4.1)") {
    val res = new GradientBoosting(
      ds.annotated(), ds.yRelation, ds.clusters, ds.features,
      BoostParams(nTrees = 3, clusterRotation = true, tree = TreeParams(maxLeaves = 4)),
      new MemSwap,
    ).train()
    assert(res.iters.map(_.cluster) == ds.clusters.map(_.fact))
    // factorized aggregates still match explicit residuals after rotating
    val rawWide = Joins.materializeJoin(JoinGraph(ds.relations, ds.edges))
    val residual = col("cast_info__y") - res.model.predictExpr(Joins.wideResolve)
    val exp = rawWide.agg(sum(residual)).collect()(0).getDouble(0)
    val mp = new MessagePassing(res.finalGraph, VarianceSemiring, new MessageCache(CacheMode.Off))
    val got = mp.totals("cast_info", PredMap.empty)
    assert(math.abs(got(1) - exp) < 1e-4 * math.max(1.0, math.abs(exp)))
  }

  test("training rmse decreases on the galaxy schema") {
    val res = boost(5)
    val wide = Joins.materializeJoin(JoinGraph(ds.relations, ds.edges)).localCheckpoint(true)
    val yCol = col("cast_info__y")
    val r0 = Boosting.rmse(wide, yCol, lit(res.model.baseScore))
    val rK = Boosting.rmse(wide, yCol, res.model.predictExpr(Joins.wideResolve))
    assert(rK < r0, s"rmse did not improve: $r0 -> $rK")
  }

  test("residual update rejects trees that span multiple clusters") {
    val g = ds.annotated()
    val badTree = TreeModel(TSplit(
      Feature("person_info", "pi_f"), NumThreshold(500.0),
      TLeaf(1.0, 10), TLeaf(2.0, 10),
    ))
    val castCluster = ds.clusters.find(_.fact == "cast_info").get
    assertThrows[IllegalArgumentException] {
      new MemSwap().update(g, castCluster, badTree, 0.1, VarianceSemiring)
    }
  }

  test("galaxy graph supports single-cluster features in any cluster containing them") {
    // person.p_f is a member of both the cast cluster and the person cluster
    val inClusters = ds.clusters.filter(_.members.contains("person"))
    assert(inClusters.size == 2)
  }
}
