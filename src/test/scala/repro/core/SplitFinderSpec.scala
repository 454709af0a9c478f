package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, TestFixtures}

/** The best-split SQL query (paper Example 2 / Appendix A) must agree with a
  * brute-force criterion scan, with its driver-side mirror, and with DuckDB
  * running the paper's window-function SQL verbatim.
  */
class SplitFinderSpec extends SparkSpec {
  import spark.implicits._

  private def singleRelMp(rows: Seq[(Double, Double)]): MessagePassing = {
    val df = rows.toDF("x", "y")
    val g  = JoinGraph.single("r", Ann.lift(df, "y", VarianceSemiring))
    new MessagePassing(g, VarianceSemiring, new MessageCache(CacheMode.Off))
  }

  private def totalsOf(rows: Seq[(Double, Double)]): Stats =
    Stats(rows.size.toDouble, rows.map(_._2).sum)

  private val rnd = new scala.util.Random(7)
  private def randomRows(n: Int, distinctX: Int): Seq[(Double, Double)] =
    Seq.fill(n)((rnd.nextInt(distinctX).toDouble, rnd.nextDouble() * 100 - 50))

  test("numeric best split matches brute force on random data (20 seeds)") {
    for (_ <- 1 to 20) {
      val rows = randomRows(60, 8)
      val mp = singleRelMp(rows)
      val got = SplitFinder.best(mp, Feature("r", "x"), PredMap.empty, totalsOf(rows))
      val exp = TestFixtures.bruteForceBestNumeric(rows)
      assert(got.isDefined == exp.isDefined)
      for (g <- got; e <- exp) {
        assert(g.value == NumThreshold(e._1), s"threshold: got ${g.value}, exp ${e._1}")
        assert(math.abs(g.crit - e._2) < 1e-6 * math.max(1.0, math.abs(e._2)))
      }
    }
  }

  test("driver-side mirror (bestNumericLocal) agrees with the SQL path") {
    for (_ <- 1 to 20) {
      val rows = randomRows(50, 6)
      val mp = singleRelMp(rows)
      val total = totalsOf(rows)
      val sql = SplitFinder.best(mp, Feature("r", "x"), PredMap.empty, total)
      val triples = rows.groupBy(_._1).map { case (v, xs) => (v, xs.size.toDouble, xs.map(_._2).sum) }.toSeq
      val local = SplitFinder.bestNumericLocal(triples, total)
      assert(sql.isDefined == local.isDefined)
      for (g <- sql; l <- local) {
        assert(g.value == NumThreshold(l._1))
        assert(math.abs(g.crit - l._2) < 1e-8 * math.max(1.0, math.abs(l._2)))
        assert(math.abs(g.left.c - l._3.c) < 1e-9 && math.abs(g.right.c - l._4.c) < 1e-9)
      }
    }
  }

  test("split sides partition the node: left+right stats equal node stats") {
    val rows = randomRows(80, 10)
    val mp = singleRelMp(rows)
    val total = totalsOf(rows)
    val g = SplitFinder.best(mp, Feature("r", "x"), PredMap.empty, total).get
    assert(math.abs(g.left.c + g.right.c - total.c) < 1e-9)
    assert(math.abs(g.left.s + g.right.s - total.s) < 1e-6)
  }

  test("criterion reduction is always non-negative") {
    for (_ <- 1 to 10) {
      val rows = randomRows(40, 5)
      val mp = singleRelMp(rows)
      val c = SplitFinder.best(mp, Feature("r", "x"), PredMap.empty, totalsOf(rows)).map(_.crit)
      c.foreach(v => assert(v >= -1e-6, s"negative criterion $v"))
    }
  }

  test("no split exists with a single distinct value") {
    val rows = Seq.fill(10)((1.0, rnd.nextDouble()))
    val mp = singleRelMp(rows)
    assert(SplitFinder.best(mp, Feature("r", "x"), PredMap.empty, totalsOf(rows)).isEmpty)
  }

  test("minLeaf forbids tiny sides") {
    val rows = Seq((1.0, 10.0)) ++ Seq.fill(20)((2.0, 0.0))
    val mp = singleRelMp(rows)
    val p = SplitFinder.Params(minLeaf = 5.0)
    assert(SplitFinder.best(mp, Feature("r", "x"), PredMap.empty, totalsOf(rows), p).isEmpty)
  }

  test("perfectly separable data yields the separating threshold") {
    val rows = (1 to 20).map(i => (i.toDouble, if (i <= 10) 0.0 else 100.0))
    val mp = singleRelMp(rows)
    val g = SplitFinder.best(mp, Feature("r", "x"), PredMap.empty, totalsOf(rows)).get
    assert(g.value == NumThreshold(10.0))
    assert(math.abs(g.left.s) < 1e-9 && math.abs(g.right.s - 1000.0) < 1e-9)
  }

  test("categorical one-vs-rest split picks the most separating value") {
    val df = Seq(("a", 100.0), ("a", 110.0), ("b", 0.0), ("b", 5.0), ("c", 2.0), ("c", 8.0)).toDF("x", "y")
    val g0 = JoinGraph.single("r", Ann.lift(df, "y", VarianceSemiring))
    val mp = new MessagePassing(g0, VarianceSemiring, new MessageCache(CacheMode.Off))
    val total = Stats(6.0, 225.0)
    val got = SplitFinder.best(mp, Feature("r", "x", CategoricalF), PredMap.empty, total).get
    assert(got.value == CatValue("a"))
    assert(got.left.c == 2.0 && math.abs(got.left.s - 210.0) < 1e-9)
  }

  test("paper Example 2 SQL on DuckDB agrees with SplitFinder") {
    val rows = randomRows(50, 6)
    val df = rows.toDF("A", "Y")
    val mp = singleRelMp(rows.map { case (x, y) => (x, y) })
    val total = totalsOf(rows)
    val got = SplitFinder.best(mp, Feature("r", "x"), PredMap.empty, total).get

    // the paper's window-function query, evaluated by DuckDB
    val conn = java.sql.DriverManager.getConnection("jdbc:duckdb:")
    try {
      conn.createStatement.execute("CREATE TABLE R (A DOUBLE, Y DOUBLE)")
      val ps = conn.prepareStatement("INSERT INTO R VALUES (?, ?)")
      rows.foreach { case (a, y) => ps.setDouble(1, a); ps.setDouble(2, y); ps.addBatch() }
      ps.executeBatch()
      val sql =
        s"""SELECT A, -(${total.s}/${total.c}) * ${total.s} + (s/c) * s
           |         + (${total.s} - s)/(${total.c} - c) * (${total.s} - s) AS criteria
           |FROM (SELECT A, SUM(c) OVER (ORDER BY A) AS c, SUM(s) OVER (ORDER BY A) AS s
           |      FROM (SELECT A, sum(Y) AS s, COUNT(*) AS c FROM R GROUP BY A))
           |WHERE c < ${total.c}
           |ORDER BY criteria DESC, A ASC LIMIT 1""".stripMargin
      val rs = conn.createStatement.executeQuery(sql)
      assert(rs.next())
      val (a, crit) = (rs.getDouble(1), rs.getDouble(2))
      assert(got.value == NumThreshold(a), s"DuckDB picked $a, SplitFinder ${got.value}")
      assert(math.abs(got.crit - crit) < 1e-6 * math.max(1.0, math.abs(crit)))
    } finally conn.close()
  }

  test("SQL-window path and local path choose identical splits (numeric)") {
    for (_ <- 1 to 10) {
      val rows = randomRows(50, 7)
      val mp = singleRelMp(rows)
      val total = totalsOf(rows)
      val loc = SplitFinder.best(mp, Feature("r", "x"), PredMap.empty, total)
      val sql = SplitFinder.best(mp, Feature("r", "x"), PredMap.empty, total,
        SplitFinder.Params(sqlWindow = true))
      assert(loc.map(_.value) == sql.map(_.value))
      for (l <- loc; s <- sql) assert(math.abs(l.crit - s.crit) < 1e-8 * math.max(1.0, math.abs(l.crit)))
    }
  }

  test("SQL-window path and local path choose identical splits (categorical)") {
    val df = Seq(("a", 10.0), ("a", 12.0), ("b", -5.0), ("c", 3.0), ("c", 4.0), ("b", -6.0)).toDF("x", "y")
    val g0 = JoinGraph.single("r", Ann.lift(df, "y", VarianceSemiring))
    val mp = new MessagePassing(g0, VarianceSemiring, new MessageCache(CacheMode.Off))
    val total = Stats(6.0, 18.0)
    val f = Feature("r", "x", CategoricalF)
    val loc = SplitFinder.best(mp, f, PredMap.empty, total)
    val sql = SplitFinder.best(mp, f, PredMap.empty, total, SplitFinder.Params(sqlWindow = true))
    assert(loc.map(_.value) == sql.map(_.value) && loc.isDefined)
  }

  test("gain criterion with beta shrinks toward smaller leaves' influence") {
    val t = Stats(10.0, 100.0)
    val noReg = GainCriterion(0.0).crit(5, 60, 5, 40, t)
    val reg   = GainCriterion(10.0).crit(5, 60, 5, 40, t)
    assert(noReg > reg, "regularization must reduce the gain")
    assert(math.abs(GainCriterion(0.0).leafPrediction(Stats(4, 8)) - 2.0) < 1e-12)
    assert(GainCriterion(4.0).leafPrediction(Stats(4, 8)) == 1.0)
  }
}
