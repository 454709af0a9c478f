package repro.core

import repro.SparkSpec
import org.apache.spark.sql.functions._

/** Algebra laws for the semirings of paper Tables 1–2 and the
  * addition-to-multiplication-preserving property (Definition 1) that
  * underpins factorized residual updates. Properties are checked over
  * seeded random samples (scalacheck-style, without the scalatestplus
  * bridge which is not in the offline cache).
  */
class SemiringSpec extends SparkSpec {

  private val rnd = new scala.util.Random(12345)
  private def d(): Double = rnd.nextDouble() * 100 - 50
  private def rv(sr: Semiring): Vector[Double] = Vector.fill(sr.components.size)(d())

  private def approx(a: Vector[Double], b: Vector[Double], tol: Double = 1e-6): Boolean =
    a.size == b.size && a.lazyZip(b).forall((x, y) => math.abs(x - y) <= tol * math.max(1.0, math.abs(x)))

  private def repeat(n: Int = 200)(f: => Unit): Unit = (1 to n).foreach(_ => f)

  private val semirings: Seq[Semiring] =
    Seq(VarianceSemiring, GradientSemiring, ClassCountSemiring(3))

  for (sr <- semirings) {
    test(s"${sr.name}: ⊕ is commutative and associative") {
      repeat() {
        val (a, b, c) = (rv(sr), rv(sr), rv(sr))
        assert(approx(sr.plusV(a, b), sr.plusV(b, a)))
        assert(approx(sr.plusV(sr.plusV(a, b), c), sr.plusV(a, sr.plusV(b, c))))
      }
    }

    test(s"${sr.name}: ⊗ is commutative and associative") {
      repeat() {
        val (a, b, c) = (rv(sr), rv(sr), rv(sr))
        assert(approx(sr.timesV(a, b), sr.timesV(b, a)))
        assert(approx(sr.timesV(sr.timesV(a, b), c), sr.timesV(a, sr.timesV(b, c)), 1e-4))
      }
    }

    test(s"${sr.name}: identities — a⊕0 = a, a⊗1 = a, a⊗0 = 0") {
      repeat() {
        val a = rv(sr)
        assert(approx(sr.plusV(a, sr.zeroV), a))
        assert(approx(sr.timesV(a, sr.oneV), a))
        assert(approx(sr.timesV(a, sr.zeroV), sr.zeroV))
      }
    }

    test(s"${sr.name}: ⊗ distributes over ⊕") {
      repeat() {
        val (a, b, c) = (rv(sr), rv(sr), rv(sr))
        assert(approx(sr.timesV(a, sr.plusV(b, c)), sr.plusV(sr.timesV(a, b), sr.timesV(a, c)), 1e-4))
      }
    }
  }

  test("variance lift is addition-to-multiplication preserving: lift(y1+y2) = lift(y1)⊗lift(y2)") {
    repeat() {
      val (y1, y2) = (d(), d())
      assert(approx(VarianceSemiring.liftV(y1 + y2),
        VarianceSemiring.timesV(VarianceSemiring.liftV(y1), VarianceSemiring.liftV(y2)), 1e-7))
    }
  }

  test("gradient lift (rmse form, h=1) is addition-to-multiplication preserving") {
    repeat() {
      val (y1, y2) = (d(), d())
      assert(approx(GradientSemiring.liftV(y1 + y2),
        GradientSemiring.timesV(GradientSemiring.liftV(y1), GradientSemiring.liftV(y2))))
    }
  }

  test("no constant-size add-to-mult preserving lift exists for mae statistics (sanity of paper's claim)") {
    // sum of signs is not determined by (count, sum-of-signs) after shifting:
    // two sets with identical (c, Σsign) diverge after subtracting p = 2.
    val a = Seq(1.0, 3.0)  // signs: ++ ; after -2: (-1, +1) → Σsign = 0
    val b = Seq(3.0, 5.0)  // signs: ++ ; after -2: (+1, +1) → Σsign = 2
    def stats(xs: Seq[Double]) = (xs.size, xs.map(math.signum).sum)
    assert(stats(a) == stats(b))
    assert(a.map(x => math.signum(x - 2)).sum != b.map(x => math.signum(x - 2)).sum)
  }

  test("variance lift components are (1, y, y²)") {
    repeat() { val y = d(); assert(VarianceSemiring.liftV(y) == Vector(1.0, y, y * y)) }
  }

  test("class-count lift marks exactly one class") {
    val sr = ClassCountSemiring(4)
    for (cls <- 1 to 4) {
      val v = sr.liftV(cls.toDouble)
      assert(v(0) == 1.0)
      assert(v.tail.sum == 1.0)
      assert(v(cls) == 1.0)
    }
  }

  test("class-count lift rejects out-of-range classes") {
    val sr = ClassCountSemiring(2)
    assertThrows[IllegalArgumentException](sr.liftV(3.0))
    assertThrows[IllegalArgumentException](sr.liftV(0.0))
  }

  test("ClassCountSemiring requires k >= 2") {
    assertThrows[IllegalArgumentException](ClassCountSemiring(1))
  }

  test("column expressions match the scalar mirrors (variance lift)") {
    import spark.implicits._
    val ys = Seq(-3.5, 0.0, 1.25, 7.0)
    val df = ys.toDF("y")
    val lifted = Ann.lift(df, "y", VarianceSemiring)
    val got = lifted.select("__c", "__s", "__q").collect()
      .map(r => Vector(r.getDouble(0), r.getDouble(1), r.getDouble(2))).toSet
    assert(got == ys.map(VarianceSemiring.liftV).toSet)
  }

  test("column expressions match the scalar mirrors (class-count lift)") {
    import spark.implicits._
    val sr = ClassCountSemiring(3)
    val df = Seq(1, 2, 3, 2).toDF("y")
    val got = Ann.lift(df, "y", sr).select(sr.components.map(col): _*).collect()
      .map(r => Vector.tabulate(sr.components.size)(r.getDouble)).toList.sortBy(_.mkString)
    val exp = Seq(1, 2, 3, 2).map(c => sr.liftV(c.toDouble)).sortBy(_.mkString)
    assert(got == exp)
  }

  test("Ann.one annotates with the ⊗-identity") {
    import spark.implicits._
    for (sr <- semirings) {
      val got = Ann.one(Seq(1, 2).toDF("x"), sr).select(sr.components.map(col): _*)
        .collect().map(r => Vector.tabulate(sr.components.size)(r.getDouble)).toSet
      assert(got == Set(sr.oneV), sr.name)
    }
  }

  test("Ann.multiplyBy matches timesV on every row") {
    import spark.implicits._
    val rows = Seq((2.0, 3.0, 5.0), (1.0, -1.0, 1.0), (4.0, 0.0, 2.0))
    val df = rows.toDF("__c", "__s", "__q")
    val elem = VarianceSemiring.liftV(2.5)
    val got = Ann.multiplyBy(df, VarianceSemiring.lift(lit(2.5)), VarianceSemiring)
      .collect().map(r => Vector(r.getDouble(0), r.getDouble(1), r.getDouble(2))).toSet
    val exp = rows.map { case (c, s, q) => VarianceSemiring.timesV(Vector(c, s, q), elem) }.toSet
    assert(got == exp)
  }

  test("Ann.multiplyJoin implements eq. (2): product of matching annotations, inner-join semantics") {
    import spark.implicits._
    val left = Seq((1L, 1.0, 2.0, 4.0), (1L, 1.0, 3.0, 9.0), (2L, 1.0, 1.0, 1.0)).toDF("k", "__c", "__s", "__q")
    val right = Seq((1L, 2.0, 0.0, 0.0)).toDF("k", "__c", "__s", "__q") // key 2 missing → dropped
    val out = Ann.multiplyJoin(left, right, Seq("k"), VarianceSemiring)
      .select("k", "__c", "__s", "__q").collect()
      .map(r => (r.getLong(0), Vector(r.getDouble(1), r.getDouble(2), r.getDouble(3)))).toSet
    val times = VarianceSemiring.timesV _
    assert(out == Set(
      (1L, times(Vector(1.0, 2.0, 4.0), Vector(2.0, 0.0, 0.0))),
      (1L, times(Vector(1.0, 3.0, 9.0), Vector(2.0, 0.0, 0.0))),
    ))
  }

  test("variance of paper Example 1 equals 4 via aggregated semiring (C,S,Q)=(8,16,36)") {
    val (c, s, q) = (8.0, 16.0, 36.0)
    assert(q - s * s / c == 4.0)
  }
}
