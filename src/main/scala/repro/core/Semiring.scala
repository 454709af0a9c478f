package repro.core

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._

/** Commutative semi-ring over fixed-width tuples of doubles (paper Table 1/2).
  *
  * Annotations are stored as extra DataFrame columns (one per component);
  * ⊕ is always component-wise SUM (so group-by aggregation is a plain
  * `sum(component)`), while ⊗ and `lift` are semiring-specific column
  * expressions. Scalar mirrors (`timesV`, `liftV`) back the in-memory
  * baseline trainer and the ScalaCheck algebra tests.
  */
trait Semiring extends Serializable {
  def name: String

  /** Annotation column names, e.g. `__c, __s, __q`. */
  def components: Seq[String]

  /** Annotation of a tuple in the Y-bearing relation (paper's lift(y)). */
  def lift(y: Column): Seq[Column]

  /** The ⊗-identity element (annotation of tuples in non-Y relations). */
  def one: Seq[Column]

  /** ⊗ as column expressions; `l`/`r` resolve a component name to a column. */
  def times(l: String => Column, r: String => Column): Seq[Column]

  // ---- scalar mirrors (same math on Vector[Double]) ----
  def liftV(y: Double): Vector[Double]
  def oneV: Vector[Double]
  def zeroV: Vector[Double] = Vector.fill(components.size)(0.0)
  def plusV(a: Vector[Double], b: Vector[Double]): Vector[Double] =
    a.lazyZip(b).map(_ + _).toVector
  def timesV(a: Vector[Double], b: Vector[Double]): Vector[Double]
}

/** Variance semi-ring (C, S, Q): supports count, sum(Y), sum(Y²) and hence
  * the rmse / reduction-in-variance criterion. Its lift is
  * addition-to-multiplication preserving (paper Def. 1), which is what makes
  * factorized residual updates possible.
  */
object VarianceSemiring extends Semiring {
  val name = "variance"
  val components: Seq[String] = Seq("__c", "__s", "__q")

  def lift(y: Column): Seq[Column] = {
    val yd = y.cast("double")
    Seq(lit(1.0), yd, yd * yd)
  }
  def one: Seq[Column] = Seq(lit(1.0), lit(0.0), lit(0.0))

  def times(l: String => Column, r: String => Column): Seq[Column] = {
    val (lc, ls, lq) = (l("__c"), l("__s"), l("__q"))
    val (rc, rs, rq) = (r("__c"), r("__s"), r("__q"))
    Seq(lc * rc, ls * rc + rs * lc, lq * rc + rq * lc + lit(2.0) * ls * rs)
  }

  def liftV(y: Double): Vector[Double] = Vector(1.0, y, y * y)
  def oneV: Vector[Double] = Vector(1.0, 0.0, 0.0)
  def timesV(a: Vector[Double], b: Vector[Double]): Vector[Double] =
    Vector(
      a(0) * b(0),
      a(1) * b(0) + b(1) * a(0),
      a(2) * b(0) + b(2) * a(0) + 2.0 * a(1) * b(1),
    )
}

/** Gradient semi-ring (H, G) of Appendix B (Table 2): carries per-tuple
  * hessian/gradient sums for second-order boosting objectives. For rmse
  * (h = 1) its lift (1, ε) is also addition-to-multiplication preserving.
  */
object GradientSemiring extends Semiring {
  val name = "gradient"
  val components: Seq[String] = Seq("__h", "__g")

  /** Default lift treats `y` as the (negative) gradient with unit hessian —
    * objectives with non-unit hessians set the components directly
    * (see [[ObjectiveBoosting]]).
    */
  def lift(y: Column): Seq[Column] = Seq(lit(1.0), y.cast("double"))
  def one: Seq[Column] = Seq(lit(1.0), lit(0.0))

  def times(l: String => Column, r: String => Column): Seq[Column] = {
    val (lh, lg) = (l("__h"), l("__g"))
    val (rh, rg) = (r("__h"), r("__g"))
    Seq(lh * rh, lg * rh + rg * lh)
  }

  def liftV(y: Double): Vector[Double] = Vector(1.0, y)
  def oneV: Vector[Double] = Vector(1.0, 0.0)
  def timesV(a: Vector[Double], b: Vector[Double]): Vector[Double] =
    Vector(a(0) * b(0), a(1) * b(0) + b(1) * a(0))
}

/** Class-count semi-ring (C, C¹, …, Cᵏ) of paper Table 1: supports the
  * classification criteria (gini, entropy, chi-square). Y values are class
  * ids in [1, k].
  */
final case class ClassCountSemiring(k: Int) extends Semiring {
  require(k >= 2, s"need at least 2 classes, got $k")
  val name = s"classcount$k"
  val components: Seq[String] = "__n" +: (1 to k).map(i => s"__k$i")

  def lift(y: Column): Seq[Column] =
    lit(1.0) +: (1 to k).map(i => when(y.cast("int") === i, 1.0).otherwise(0.0))
  def one: Seq[Column] = lit(1.0) +: Seq.fill(k)(lit(0.0))

  def times(l: String => Column, r: String => Column): Seq[Column] = {
    val (ln, rn) = (l("__n"), r("__n"))
    (ln * rn) +: (1 to k).map { i =>
      l(s"__k$i") * rn + ln * r(s"__k$i")
    }
  }

  def liftV(y: Double): Vector[Double] = {
    val cls = y.toInt
    require(cls >= 1 && cls <= k, s"class $cls out of [1,$k]")
    (1.0 +: Vector.tabulate(k)(i => if (i + 1 == cls) 1.0 else 0.0)).toVector
  }
  def oneV: Vector[Double] = (1.0 +: Vector.fill(k)(0.0)).toVector
  def timesV(a: Vector[Double], b: Vector[Double]): Vector[Double] =
    (a(0) * b(0)) +: Vector.tabulate(k)(i => a(i + 1) * b(0) + a(0) * b(i + 1))
}

/** Helpers for attaching / combining annotation columns on DataFrames. */
object Ann {
  /** Annotate the Y-bearing relation: components := sr.lift(yCol). */
  def lift(df: DataFrame, yCol: String, sr: Semiring): DataFrame =
    withCols(df, sr.components.zip(sr.lift(col(yCol))))

  /** Annotate a non-Y relation with the ⊗-identity. */
  def one(df: DataFrame, sr: Semiring): DataFrame =
    withCols(df, sr.components.zip(sr.one))

  /** `left ⋈ right` with annotation ⊗ (paper eq. (2)). `right` must carry
    * exactly `keys ++ components`. Inner join: absent keys annihilate, which
    * is how semi-join filtering falls out of the algebra.
    *
    * `broadcastRight` is set by message passing: a message is an aggregate
    * bounded by the join-key domain, so hash-joining it broadcast-side is
    * the physical plan a DBMS would pick (the session disables automatic
    * broadcasts to keep large-table joins on the shuffle path).
    */
  def multiplyJoin(left: DataFrame, right: DataFrame, keys: Seq[String], sr: Semiring,
                   broadcastRight: Boolean = false): DataFrame = {
    // exactly two projections (rename right comps; compute products) — the
    // training workload runs hundreds of such queries, so plan size matters
    val renamed0 = right.select(right.columns.toSeq.map { c =>
      if (sr.components.contains(c)) col(c).as("__r" + c) else col(c)
    }: _*)
    val renamed = if (broadcastRight) broadcast(renamed0) else renamed0
    val joined  = left.join(renamed, keys, "inner")
    val prods   = sr.times(n => joined(n), n => joined("__r" + n))
    val dropSet = (sr.components ++ sr.components.map("__r" + _)).toSet
    val keep    = joined.columns.toSeq.filterNot(dropSet).map(joined(_))
    joined.select(keep ++ sr.components.zip(prods).map { case (n, c) => c.as(n) }: _*)
  }

  /** Multiply existing annotations by a semiring element given as columns
    * (used for residual updates: annotations ⊗ lift(-p)).
    */
  def multiplyBy(df: DataFrame, element: Seq[Column], sr: Semiring): DataFrame = {
    val byName = sr.components.zip(element).toMap
    withCols(df, sr.components.zip(sr.times(n => col(n), byName)))
  }

  /** SUM aggregation of every component (⊕ is component-wise addition). */
  def sumAggs(sr: Semiring): Seq[Column] =
    sr.components.map(c => sum(col(c)).as(c))

  private def withCols(df: DataFrame, cols: Seq[(String, Column)]): DataFrame =
    df.withColumns(cols.map { case (n, c) => n -> c }.toMap)
}
