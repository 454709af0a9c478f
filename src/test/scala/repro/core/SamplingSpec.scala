package repro.core

import repro.SparkSpec

/** Ancestral sampling over the non-materialized join (paper §5.5.2): samples
  * must be distributed like uniform draws from R⋈.
  */
class SamplingSpec extends SparkSpec {
  import spark.implicits._

  // Small 3-relation chain with a skewed join: key 1 fans out 3×, key 2 1×.
  private lazy val graph: JoinGraph = {
    val r = Seq((1, 10.0), (2, 20.0)).toDF("k", "y")            // root
    val s = Seq((1, "a"), (1, "b"), (1, "c"), (2, "d")).toDF("k", "tag")
    Boosting.prepare(
      Map("r" -> r, "s" -> s),
      Seq(Edge("r", "s", Seq("k"))),
      yRelation = "r", yCol = "y",
    )
  }

  test("sample tuples join correctly (key consistency across relations)") {
    val samples = Sampling.ancestral(graph, "r", 50, seed = 1)
    samples.foreach { t =>
      assert(t("r__k") == t("s__k"), s"sampled tuple does not join: $t")
    }
  }

  test("marginal over the root matches join-size weighting (3:1)") {
    val n = 4000
    val samples = Sampling.ancestral(graph, "r", n, seed = 2)
    val p1 = samples.count(_("r__k") == 1).toDouble / n
    // R⋈ has 3 rows with k=1 and 1 with k=2 → P(k=1) = 0.75
    assert(math.abs(p1 - 0.75) < 0.03, s"P(k=1) = $p1, expected 0.75")
  }

  test("factorized marginal helper agrees with brute force") {
    val mp = new MessagePassing(graph, VarianceSemiring, new MessageCache(CacheMode.Off))
    val m = Sampling.marginal(mp, "r", "k")
    assert(math.abs(m(1) - 0.75) < 1e-9)
    assert(math.abs(m(2) - 0.25) < 1e-9)
  }

  test("conditional draws are uniform within a key group") {
    val samples = Sampling.ancestral(graph, "r", 3000, seed = 3)
    val within1 = samples.filter(_("r__k") == 1)
    val byTag = within1.groupBy(_("s__tag")).view.mapValues(_.size.toDouble / within1.size).toMap
    for (tag <- Seq("a", "b", "c"))
      assert(math.abs(byTag(tag) - 1.0 / 3) < 0.05, s"P(tag=$tag | k=1) = ${byTag(tag)}")
  }

  test("empty join is rejected") {
    val r = Seq((1, 1.0)).toDF("k", "y")
    val s = Seq((2, "x")).toDF("k", "tag")
    val g = Boosting.prepare(Map("r" -> r, "s" -> s), Seq(Edge("r", "s", Seq("k"))), "r", "y")
    assertThrows[IllegalArgumentException](Sampling.ancestral(g, "r", 1, seed = 4))
  }

  test("sampling a 3-relation galaxy-shaped graph visits all relations") {
    val ds = repro.TestFixtures.galaxy(spark, nCast = 100, nEntity = 10, infoPer = 2)
    val g = ds.annotated()
    val samples = Sampling.ancestral(g, "cast_info", 5, seed = 5)
    val rels = ds.relations.keySet
    samples.foreach { t =>
      for (r <- rels) assert(t.keys.exists(_.startsWith(r + "__")), s"missing columns of $r in $t")
    }
  }
}
