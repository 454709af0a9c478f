package repro

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.scalatest.Assertions._
import repro.core._
import repro.data.{Dataset, Galaxy, Star}

/** Shared small datasets and assertion helpers for the unit tests. */
object TestFixtures {

  def star(
      spark: SparkSession,
      nFact: Long = 2000,
      dimRows: Int = 50,
      includeCategorical: Boolean = false,
      extraFeaturesPerDim: Int = 0,
      seed: Long = 42,
  ): Dataset =
    Star.generate(spark, Star.Config(
      nFact = nFact, dimRows = dimRows, seed = seed,
      includeCategorical = includeCategorical,
      extraFeaturesPerDim = extraFeaturesPerDim,
    ))

  def galaxy(spark: SparkSession, nCast: Long = 800, nEntity: Long = 60, infoPer: Int = 3): Dataset =
    Galaxy.generate(spark, Galaxy.Config(
      nPerson = nEntity, nMovie = nEntity, nCast = nCast,
      infoPerPerson = infoPer, infoPerMovie = infoPer,
    ))

  /** Small TPC-H-lite chain lineitem — orders — customer with join keys
    * renamed so natural-join edges work; Y = l_quantity on lineitem.
    */
  def tpchChain(spark: SparkSession, sf: Double = 0.0005): Map[String, DataFrame] = {
    val li = SynthData.lineitem(spark, sf).select("l_orderkey", "l_quantity", "l_linenumber")
    val o = SynthData.orders(spark, sf)
      .withColumnRenamed("o_orderkey", "l_orderkey")
      .select("l_orderkey", "o_custkey", "o_orderstatus")
    val c = SynthData.customer(spark, sf)
      .withColumnRenamed("c_custkey", "o_custkey")
      .select("o_custkey", "c_mktsegment", "c_nationkey")
    Map("lineitem" -> li, "orders" -> o, "customer" -> c)
  }

  def tpchEdges: Seq[Edge] = Seq(
    Edge("lineitem", "orders", Seq("l_orderkey")),
    Edge("orders", "customer", Seq("o_custkey")),
  )

  /** Structural tree equality with float tolerance on thresholds/leaves. */
  def assertTreesEqual(a: TreeModel, b: TreeModel, tol: Double = 1e-6): Unit = {
    def eq(x: TNode, y: TNode, path: String): Unit = (x, y) match {
      case (TLeaf(p1, c1), TLeaf(p2, c2)) =>
        assert(math.abs(p1 - p2) <= tol * math.max(1.0, math.abs(p1)), s"leaf prediction differs at $path: $p1 vs $p2")
        assert(math.abs(c1 - c2) <= 0.5, s"leaf count differs at $path: $c1 vs $c2")
      case (TSplit(f1, v1, l1, r1), TSplit(f2, v2, l2, r2)) =>
        assert(f1 == f2, s"split feature differs at $path: $f1 vs $f2")
        (v1, v2) match {
          case (NumThreshold(t1), NumThreshold(t2)) =>
            assert(math.abs(t1 - t2) <= tol * math.max(1.0, math.abs(t1)), s"threshold differs at $path: $t1 vs $t2")
          case (CatValue(c1), CatValue(c2)) => assert(c1 == c2, s"cat value differs at $path")
          case _ => fail(s"split kind differs at $path")
        }
        eq(l1, l2, path + "L"); eq(r1, r2, path + "R")
      case _ => fail(s"tree shape differs at $path:\n${a.render}\nvs\n${b.render}")
    }
    eq(a.root, b.root, "·")
  }

  /** Brute-force variance-criterion best split over collected (x, y) pairs
    * for cross-checking SplitFinder.
    */
  def bruteForceBestNumeric(xy: Seq[(Double, Double)], minLeaf: Double = 1.0): Option[(Double, Double)] = {
    val n = xy.size.toDouble
    val s = xy.map(_._2).sum
    val candidates = xy.map(_._1).distinct.sorted
    val res = candidates.flatMap { v =>
      val left  = xy.filter(_._1 <= v)
      val right = xy.filter(_._1 > v)
      if (left.size >= minLeaf && right.size >= minLeaf) {
        val sl = left.map(_._2).sum; val sr = right.map(_._2).sum
        val crit = -(s / n) * s + (sl / left.size) * sl + (sr / right.size) * sr
        Some((v, crit))
      } else None
    }
    if (res.isEmpty) None
    else Some(res.maxBy { case (v, c) => (c, -v) })
  }
}
