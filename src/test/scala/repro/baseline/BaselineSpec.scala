package repro.baseline

import org.apache.spark.sql.functions._
import repro.{SparkSpec, TestFixtures}
import repro.core._

/** The ML-library stand-in and the non-factorized trainers (DESIGN.md
  * substitution table): array GBDT correctness, export/load cost accounting,
  * and the simulated memory budget.
  */
class BaselineSpec extends SparkSpec {

  private lazy val ds = TestFixtures.star(spark, nFact = 1200, dimRows = 25).persist()
  private lazy val table =
    WideTable.fromWide(Materialize.wide(ds), ds.features, Materialize.wideTargetCol(ds))

  test("WideTable collects the right shape") {
    assert(table.n == 1200)
    assert(table.features.length == ds.features.count(_.kind == NumericF))
  }

  test("in-memory single tree split equals brute force") {
    val gbdt = new InMemoryGBDT(table, TreeParams(maxLeaves = 2))
    val tree = gbdt.trainTree(Array.range(0, table.n), table.y, table.features.indices)
    val split = tree.root.asInstanceOf[TSplit]
    val j = table.features.indexOf(split.feature)
    val xy = (0 until table.n).map(i => (table.cols(j)(i), table.y(i)))
    val bf = TestFixtures.bruteForceBestNumeric(xy).get
    assert(split.value == NumThreshold(bf._1))

    // and no other feature does better
    val bestAll = table.features.indices.flatMap { jj =>
      TestFixtures.bruteForceBestNumeric((0 until table.n).map(i => (table.cols(jj)(i), table.y(i))))
    }.map(_._2).max
    assert(math.abs(bf._2 - bestAll) < 1e-9)
  }

  test("in-memory boosting reduces rmse monotonically") {
    val gbdt = new InMemoryGBDT(table, TreeParams(maxLeaves = 4))
    val m1 = gbdt.boost(1, 0.1)
    val m5 = gbdt.boost(5, 0.1)
    assert(gbdt.rmse(m5) < gbdt.rmse(m1))
  }

  test("parallel residual update equals sequential subtraction") {
    val y = Array.tabulate(10000)(i => i.toDouble)
    val expected = y.map(_ - 2.5)
    InMemoryGBDT.parallelResidualUpdate(y, _ => 2.5)
    assert(y.toSeq == expected.toSeq)
  }

  test("forest sampling uses distinct row subsets per tree") {
    val gbdt = new InMemoryGBDT(table, TreeParams(maxLeaves = 4))
    val f = gbdt.forest(3, sampleRate = 0.5, featureRate = 0.8, seed = 3)
    assert(f.trees.size == 3)
    assert(f.trees.map(_.render).distinct.size > 1)
  }

  test("exportLoad charges materialize/export/load and round-trips the rows") {
    val wide = Materialize.wide(ds)
    val keep = ds.features.filter(_.kind == NumericF)
      .map(f => s"${f.relation}__${f.column}") :+ Materialize.wideTargetCol(ds)
    val (loaded, costs) = Materialize.exportLoad(spark, wide, keep)
    assert(costs.rows == 1200)
    assert(loaded.count() == 1200)
    assert(loaded.columns.length == keep.size)
    assert(costs.materializeMs >= 0 && costs.exportMs >= 0 && costs.loadMs >= 0)
  }

  test("simulated memory budget refuses oversized wide tables") {
    Materialize.checkBudget(rows = 100, cols = 10, cellBudget = 10000) // fits
    assertThrows[Materialize.OutOfBudget] {
      Materialize.checkBudget(rows = 2000, cols = 10, cellBudget = 10000)
    }
    Materialize.checkBudget(rows = 1L << 40, cols = 100, cellBudget = 0) // 0 disables
  }

  test("naive (materialized, cached) tree equals the factorized tree") {
    val params = TreeParams(maxLeaves = 4)
    val mp = new MessagePassing(ds.annotated(), VarianceSemiring, new MessageCache(CacheMode.Shared))
    val fact = new FactorizedTreeTrainer(mp, ds.features, params).train()
    TestFixtures.assertTreesEqual(WideTrainers.naiveTree(ds, params), fact)
  }

  test("madlib-like (uncached, re-joined) tree equals the factorized tree") {
    val small = TestFixtures.star(spark, nFact = 400, dimRows = 10)
    val params = TreeParams(maxLeaves = 4)
    val mp = new MessagePassing(small.annotated(), VarianceSemiring, new MessageCache(CacheMode.Shared))
    val fact = new FactorizedTreeTrainer(mp, small.features, params).train()
    TestFixtures.assertTreesEqual(WideTrainers.madlibTree(small, params), fact)
  }

  test("madlib-like row-at-a-time trainer equals the factorized tree") {
    val small = TestFixtures.star(spark, nFact = 400, dimRows = 10)
    val params = TreeParams(maxLeaves = 4)
    val mp = new MessagePassing(small.annotated(), VarianceSemiring, new MessageCache(CacheMode.Shared))
    val fact = new FactorizedTreeTrainer(mp, small.features, params).train()
    TestFixtures.assertTreesEqual(new MadlibLikeTrainer(small, params).train(), fact)
  }

  test("oracle sanity: DuckDB agrees with Spark on a trivial aggregate") {
    import spark.implicits._
    val df = Seq((1, 2.0), (1, 3.0), (2, 4.0)).toDF("k", "v")
    val got = df.groupBy($"k").agg(sum($"v").as("s")).select($"k", $"s")
    repro.Oracle.assertEquivalent(got,
      "SELECT k, sum(CAST(v AS DOUBLE)) AS s FROM t GROUP BY k", "t" -> df)
  }
}
