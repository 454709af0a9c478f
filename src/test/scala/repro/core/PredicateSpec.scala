package repro.core

import repro.SparkSpec

class PredicateSpec extends SparkSpec {
  import spark.implicits._

  private lazy val df = Seq((1.0, "a"), (2.0, "b"), (3.0, "a"), (4.0, "c")).toDF("x", "s")

  test("Le selects <= and negates to Gt") {
    assert(df.where(Le("x", 2.0).toCol).count() == 2)
    assert(Le("x", 2.0).negate == Gt("x", 2.0))
  }

  test("Gt selects > and negates to Le") {
    assert(df.where(Gt("x", 2.0).toCol).count() == 2)
    assert(Gt("x", 2.0).negate == Le("x", 2.0))
  }

  test("CatEq / CatNe partition the rows") {
    val eq = df.where(CatEq("s", "a").toCol).count()
    val ne = df.where(CatNe("s", "a").toCol).count()
    assert(eq == 2 && ne == 2 && eq + ne == df.count())
  }

  test("predicate and its negation partition rows for any threshold") {
    for (v <- Seq(0.5, 1.0, 2.5, 4.0, 9.0)) {
      val p = Le("x", v)
      assert(df.where(p.toCol).count() + df.where(p.negate.toCol).count() == df.count())
    }
  }

  test("sig is canonical and distinct per predicate") {
    val sigs = Seq(Le("x", 1.0), Gt("x", 1.0), CatEq("s", "a"), CatNe("s", "a")).map(_.sig)
    assert(sigs.distinct.size == 4)
  }

  test("Predicate.forSplit produces the (left, right) pair") {
    val (l, r) = Predicate.forSplit(Feature("rel", "x"), NumThreshold(2.0))
    assert(l == Le("x", 2.0) && r == Gt("x", 2.0))
    val (cl, cr) = Predicate.forSplit(Feature("rel", "s", CategoricalF), CatValue("a"))
    assert(cl == CatEq("s", "a") && cr == CatNe("s", "a"))
  }

  test("PredMap.add accumulates and sig is order-insensitive") {
    val m1 = PredMap.add(PredMap.add(PredMap.empty, "r", Le("x", 1.0)), "r", Gt("y", 2.0))
    val m2 = PredMap.add(PredMap.add(PredMap.empty, "r", Gt("y", 2.0)), "r", Le("x", 1.0))
    assert(PredMap.sig(m1, "r") == PredMap.sig(m2, "r"))
    assert(PredMap.sig(m1, "other") == "")
    assert(m1("r").size == 2)
  }

  test("double-valued split of an integer column keeps exact semantics") {
    val ints = Seq(1, 2, 3).toDF("x")
    assert(ints.where(Le("x", 2.0).toCol).count() == 2)
    assert(ints.where(Le("x", 1.999999).toCol).count() == 1)
  }
}
