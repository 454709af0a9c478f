package repro.data

import org.apache.spark.sql.functions._
import repro.{SparkSpec, TestFixtures}
import repro.core._

/** Generator contracts: schemas, key integrity, determinism, and the
  * paper's imputation rules (features in [1,1000]; footnote-7 target).
  */
class DataSpec extends SparkSpec {

  private lazy val star = TestFixtures.star(spark, nFact = 1000, dimRows = 40, includeCategorical = true)
  private lazy val galaxy = TestFixtures.galaxy(spark, nCast = 500, nEntity = 30, infoPer = 2)

  test("star: expected relations and edges") {
    assert(star.relations.keySet == Set("sales", "dates", "stores", "items", "transactions", "oil"))
    assert(star.edges.size == 5 && star.edges.forall(_.a == "sales"))
  }

  test("star: fact row count and dim row counts match the config") {
    assert(star.relations("sales").count() == 1000)
    for (d <- Seq("dates", "stores", "items", "transactions", "oil"))
      assert(star.relations(d).count() == 40, s"dim $d")
  }

  test("star: referential integrity — every fact key joins a dim row") {
    val g = JoinGraph(star.relations, star.edges)
    assert(Joins.materializeJoin(g).count() == 1000, "inner join lost rows ⇒ dangling keys")
  }

  test("star: imputed features are ints in [1, 1000] (paper preprocessing)") {
    for (f <- star.features if f.kind == NumericF) {
      val row = star.relations(f.relation)
        .agg(min(col(f.column)), max(col(f.column))).collect()(0)
      val (lo, hi) = (row.getInt(0), row.getInt(1))
      assert(lo >= 1 && hi <= 1000, s"$f range [$lo,$hi]")
    }
  }

  test("star: target matches footnote-7 formula recomputed through the join") {
    val g = JoinGraph(star.relations, star.edges)
    val wide = Joins.materializeJoin(g).limit(100).collect()
    val cols = Joins.materializeJoin(g).limit(1).columns
    wide.foreach { r =>
      def v(c: String) = r.get(cols.indexOf(c)) match {
        case i: Int => i.toDouble; case d: Double => d; case l: Long => l.toDouble
      }
      val expBase = v("items__f_items") * math.log(v("items__f_items")) +
        math.log(v("oil__f_oil")) - 10 * v("dates__f_dates") - 10 * v("stores__f_stores") +
        v("transactions__f_trans") * v("transactions__f_trans") + 0.5 * v("sales__f_sales")
      val promo = r.getString(cols.indexOf("sales__f_promo")) match {
        case "yes" => 500.0; case "no" => -500.0; case _ => 0.0
      }
      val y = v("sales__y")
      // remaining gap is the bounded deterministic noise (amp 50 → |noise| <= 25)
      assert(math.abs(y - expBase - promo) <= 25.0 + 1e-9, s"target off: $y vs ${expBase + promo}")
    }
  }

  test("star: generation is deterministic in the seed") {
    val a = TestFixtures.star(spark, nFact = 200, dimRows = 10, seed = 5)
    val b = TestFixtures.star(spark, nFact = 200, dimRows = 10, seed = 5)
    val ya = a.relations("sales").select("y").collect().map(_.getDouble(0)).sorted.toSeq
    val yb = b.relations("sales").select("y").collect().map(_.getDouble(0)).sorted.toSeq
    assert(ya == yb)
    val c = TestFixtures.star(spark, nFact = 200, dimRows = 10, seed = 6)
    val yc = c.relations("sales").select("y").collect().map(_.getDouble(0)).sorted.toSeq
    assert(ya != yc)
  }

  test("star: extra features scale the feature count (TPC-DS-lite dial)") {
    val wide = Star.generate(spark, Star.Config(nFact = 100, dimRows = 10, extraFeaturesPerDim = 3))
    assert(wide.features.size == star.features.size + 15)
    assert(wide.relations("dates").columns.count(_.startsWith("f_dates")) == 4)
  }

  test("star: extra fact payload columns appear (CREATE-k dial)") {
    val k = Star.generate(spark, Star.Config(nFact = 100, dimRows = 10, extraFactCols = 5))
    assert(k.relations("sales").columns.count(_.startsWith("payload_")) == 5)
  }

  test("galaxy: expected relations, edges, clusters") {
    assert(galaxy.relations.keySet ==
      Set("person", "movie", "person_info", "movie_info", "cast_info"))
    assert(galaxy.edges.size == 4)
    assert(galaxy.clusters.map(_.fact).toSet == Set("cast_info", "person_info", "movie_info"))
  }

  test("galaxy: info tables have exactly infoPer rows per entity") {
    val perPerson = galaxy.relations("person_info").groupBy("p_id").count()
      .select(min("count"), max("count")).collect()(0)
    assert(perPerson.getLong(0) == 2 && perPerson.getLong(1) == 2)
  }

  test("galaxy: join keys are dense (no dangling cast rows)") {
    val g = JoinGraph(galaxy.relations, galaxy.edges)
    val wide = Joins.materializeJoin(g).count()
    assert(wide == 500L * 2 * 2)
  }

  test("galaxy: y depends on person and movie features (predictive signal)") {
    val g = JoinGraph(galaxy.relations, galaxy.edges)
    val wide = Joins.materializeJoin(g)
    val corr = wide.select(org.apache.spark.sql.functions.corr(
      col("person__p_f").cast("double"), col("cast_info__y"))).collect()(0).getDouble(0)
    assert(corr > 0.3, s"p_f should correlate with y, corr=$corr")
  }

  test("TPC-H-lite chain fixture joins correctly") {
    val rels = TestFixtures.tpchChain(spark)
    val g = JoinGraph(rels, TestFixtures.tpchEdges)
    assert(Joins.materializeJoin(g).count() > 0)
  }
}
