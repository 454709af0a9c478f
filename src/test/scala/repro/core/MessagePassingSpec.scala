package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, TestFixtures}

/** Factorized aggregation must equal aggregation over the materialized join
  * — checked against the paper's worked Figure 1 example and against DuckDB
  * as an independent oracle on TPC-H-lite and star-schema data.
  */
class MessagePassingSpec extends SparkSpec {

  // ---- paper Figure 1 fixture: R[A,B], S[A,C], T[A,D], Y = B ----
  private lazy val figure1: JoinGraph = {
    import spark.implicits._
    val r = Seq((1, 2), (1, 3), (2, 1), (2, 2)).toDF("A", "B")
    val s = Seq((1, 2), (2, 1), (2, 3)).toDF("A", "C")
    val t = Seq((1, 1), (1, 2), (2, 2)).toDF("A", "D")
    Boosting.prepare(
      Map("R" -> r, "S" -> s, "T" -> t),
      Seq(Edge("R", "S", Seq("A")), Edge("S", "T", Seq("A"))),
      yRelation = "R", yCol = "B",
    )
  }

  private def mp(g: JoinGraph, mode: CacheMode = CacheMode.Off): MessagePassing =
    new MessagePassing(g, VarianceSemiring, new MessageCache(mode))

  test("Example 1: γ(R⋈S⋈T) = (8, 16, 36) and variance = 4") {
    val t = mp(figure1).totals("R", PredMap.empty)
    assert(t == Vector(8.0, 16.0, 36.0))
    assert(t(2) - t(1) * t(1) / t(0) == 4.0)
  }

  test("totals are independent of the chosen root relation") {
    for (root <- Seq("R", "S", "T"))
      assert(mp(figure1).totals(root, PredMap.empty) == Vector(8.0, 16.0, 36.0))
  }

  test("Example 3: γ_C(R⋈) via root S matches the materialized join") {
    val got = mp(figure1).aggregate("S", Seq("C"), PredMap.empty)
      .select(col("C"), col("__c"), col("__s"), col("__q"))
    Oracle.assertEquivalent(
      got,
      """SELECT C, CAST(count(*) AS DOUBLE) AS __c,
        |       sum(CAST(B AS DOUBLE)) AS __s,
        |       sum(CAST(B AS DOUBLE) * CAST(B AS DOUBLE)) AS __q
        |FROM R JOIN S USING (A) JOIN T USING (A) GROUP BY C""".stripMargin,
      "R" -> figure1.rel("R").drop("__c", "__s", "__q"),
      "S" -> figure1.rel("S").drop("__c", "__s", "__q"),
      "T" -> figure1.rel("T").drop("__c", "__s", "__q"),
    )
  }

  test("γ_D(R⋈) via root T matches the materialized join") {
    val got = mp(figure1).aggregate("T", Seq("D"), PredMap.empty)
      .select(col("D"), col("__c"), col("__s"), col("__q"))
    Oracle.assertEquivalent(
      got,
      """SELECT D, CAST(count(*) AS DOUBLE) AS __c,
        |       sum(CAST(B AS DOUBLE)) AS __s,
        |       sum(CAST(B AS DOUBLE) * CAST(B AS DOUBLE)) AS __q
        |FROM R JOIN S USING (A) JOIN T USING (A) GROUP BY D""".stripMargin,
      "R" -> figure1.rel("R").drop("__c", "__s", "__q"),
      "S" -> figure1.rel("S").drop("__c", "__s", "__q"),
      "T" -> figure1.rel("T").drop("__c", "__s", "__q"),
    )
  }

  test("predicate-filtered aggregation matches the filtered materialized join") {
    val preds = PredMap.add(PredMap.empty, "T", Gt("D", 1.0))
    val got = mp(figure1).aggregate("S", Seq("C"), preds)
      .select(col("C"), col("__c"), col("__s"))
    Oracle.assertEquivalent(
      got,
      """SELECT C, CAST(count(*) AS DOUBLE) AS __c, sum(CAST(B AS DOUBLE)) AS __s
        |FROM R JOIN S USING (A) JOIN T USING (A)
        |WHERE CAST(D AS DOUBLE) > 1 GROUP BY C""".stripMargin,
      "R" -> figure1.rel("R").drop("__c", "__s", "__q"),
      "S" -> figure1.rel("S").drop("__c", "__s", "__q"),
      "T" -> figure1.rel("T").drop("__c", "__s", "__q"),
    )
  }

  test("empty predicate selection yields zero totals") {
    val preds = PredMap.add(PredMap.empty, "T", Gt("D", 99.0))
    assert(mp(figure1).totals("R", preds) == Vector(0.0, 0.0, 0.0))
  }

  // ---- TPC-H-lite 3-relation chain, DuckDB as oracle ----
  private lazy val tpch: JoinGraph = {
    val rels = TestFixtures.tpchChain(spark)
    Boosting.prepare(rels, TestFixtures.tpchEdges, "lineitem", "l_quantity")
  }
  private lazy val tpchRaw = TestFixtures.tpchChain(spark)

  test("TPC-H chain: global aggregate matches DuckDB") {
    val got = mp(tpch).aggregate("customer", Seq.empty, PredMap.empty)
      .select(col("__c"), col("__s"), col("__q"))
    Oracle.assertEquivalent(
      got,
      """SELECT CAST(count(*) AS DOUBLE) AS __c,
        |       sum(CAST(l_quantity AS DOUBLE)) AS __s,
        |       sum(CAST(l_quantity AS DOUBLE) * CAST(l_quantity AS DOUBLE)) AS __q
        |FROM lineitem JOIN orders USING (l_orderkey) JOIN customer USING (o_custkey)""".stripMargin,
      "lineitem" -> tpchRaw("lineitem"), "orders" -> tpchRaw("orders"), "customer" -> tpchRaw("customer"),
    )
  }

  test("TPC-H chain: γ grouped by a customer attribute matches DuckDB") {
    val got = mp(tpch).aggregate("customer", Seq("c_mktsegment"), PredMap.empty)
      .select(col("c_mktsegment"), col("__c"), col("__s"))
    Oracle.assertEquivalent(
      got,
      """SELECT c_mktsegment, CAST(count(*) AS DOUBLE) AS __c,
        |       sum(CAST(l_quantity AS DOUBLE)) AS __s
        |FROM lineitem JOIN orders USING (l_orderkey) JOIN customer USING (o_custkey)
        |GROUP BY c_mktsegment""".stripMargin,
      "lineitem" -> tpchRaw("lineitem"), "orders" -> tpchRaw("orders"), "customer" -> tpchRaw("customer"),
    )
  }

  test("TPC-H chain: filtered γ grouped by an orders attribute matches DuckDB") {
    val preds = PredMap.add(PredMap.empty, "customer", Le("c_nationkey", 10.0))
    val got = mp(tpch).aggregate("orders", Seq("o_orderstatus"), preds)
      .select(col("o_orderstatus"), col("__c"), col("__s"))
    Oracle.assertEquivalent(
      got,
      """SELECT o_orderstatus, CAST(count(*) AS DOUBLE) AS __c,
        |       sum(CAST(l_quantity AS DOUBLE)) AS __s
        |FROM lineitem JOIN orders USING (l_orderkey) JOIN customer USING (o_custkey)
        |WHERE CAST(c_nationkey AS DOUBLE) <= 10
        |GROUP BY o_orderstatus""".stripMargin,
      "lineitem" -> tpchRaw("lineitem"), "orders" -> tpchRaw("orders"), "customer" -> tpchRaw("customer"),
    )
  }

  // ---- star schema: factorized == wide aggregation in Spark itself ----
  test("star schema: factorized grouped aggregates equal wide-table aggregates for every feature") {
    val ds = TestFixtures.star(spark, nFact = 1500, dimRows = 30)
    val g  = ds.annotated()
    val m  = mp(g)
    val wide = Joins.materializeJoinAnnotated(g, VarianceSemiring)
    for (f <- ds.features) {
      val fact = m.aggregate(f.relation, Seq(f.column), PredMap.empty)
        .select(col(f.column).cast("double").as("v"), col("__c"), col("__s"), col("__q"))
        .collect().map(r => (r.getDouble(0), (r.getDouble(1), r.getDouble(2), r.getDouble(3)))).toMap
      val exp = wide.groupBy(col(s"${f.relation}__${f.column}").cast("double").as("v"))
        .agg(sum("__c").as("__c"), sum("__s").as("__s"), sum("__q").as("__q"))
        .collect().map(r => (r.getDouble(0), (r.getDouble(1), r.getDouble(2), r.getDouble(3)))).toMap
      assert(fact.keySet == exp.keySet, s"feature $f value sets differ")
      for ((k, (c, s, q)) <- exp) {
        val (gc, gs, gq) = fact(k)
        assert(math.abs(gc - c) < 1e-6 && math.abs(gs - s) < 1e-4 && math.abs(gq - q) < 1e-2,
          s"feature $f value $k: got ($gc,$gs,$gq) expected ($c,$s,$q)")
      }
    }
  }

  test("message caching returns identical results and records hits") {
    val metrics = new Metrics
    val cache = new MessageCache(CacheMode.Shared, metrics = metrics)
    val m = new MessagePassing(figure1, VarianceSemiring, cache, metrics)
    val a = m.totals("S", PredMap.empty)
    val b = m.totals("S", PredMap.empty)
    assert(a == b)
    val snap = metrics.snapshot
    assert(snap.cacheHits >= 2, s"expected cache hits, got ${snap.cacheHits}")
  }

  test("messages are invalidated when a relation version changes") {
    val cache = new MessageCache(CacheMode.Shared)
    val m1 = new MessagePassing(figure1, VarianceSemiring, cache)
    assert(m1.totals("S", PredMap.empty) == Vector(8.0, 16.0, 36.0))
    // double every annotation of T — totals must double, not hit stale cache
    val t2 = Ann.multiplyBy(figure1.rel("T"), Seq(lit(2.0), lit(0.0), lit(0.0)), VarianceSemiring)
    val g2 = figure1.withRelation("T", t2)
    val m2 = new MessagePassing(g2, VarianceSemiring, cache)
    assert(m2.totals("S", PredMap.empty) == Vector(16.0, 32.0, 72.0))
  }

  test("PerNode cache clears on demand") {
    val cache = new MessageCache(CacheMode.PerNode)
    val m = new MessagePassing(figure1, VarianceSemiring, cache)
    m.totals("S", PredMap.empty)
    assert(cache.size > 0)
    cache.clear()
    assert(cache.size == 0)
  }
}
