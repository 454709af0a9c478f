package repro.core

import repro.SparkSpec

/** Classification criteria over the class-count semiring (paper Appendix A). */
class ClassSplitSpec extends SparkSpec {
  import spark.implicits._

  private val sr = ClassCountSemiring(2)

  /** x separates classes perfectly at x <= 2. */
  private lazy val separable: JoinGraph = {
    val df = Seq((1.0, 1), (2.0, 1), (2.0, 1), (3.0, 2), (4.0, 2), (5.0, 2)).toDF("x", "cls")
    JoinGraph.single("r", Ann.lift(df, "cls", sr))
  }
  private def mp(g: JoinGraph) = new MessagePassing(g, sr, new MessageCache(CacheMode.Off))

  test("gini impurity of a pure node is 0, of a 50/50 node is 0.5") {
    assert(ClassSplit.Gini.score(Vector(2, 2, 0), Vector(2, 0, 2)) == 0.5)
  }

  test("entropy information gain of a clean split equals parent entropy") {
    val parentEntropy = -0.5 * math.log(0.5) * 2
    val gain = ClassSplit.Entropy.score(Vector(3, 3, 0), Vector(3, 0, 3))
    assert(math.abs(gain - parentEntropy) < 1e-12)
  }

  test("chi-square of an independent split is 0") {
    // same class ratio on both sides → observed == expected
    val s = ClassSplit.ChiSquare.score(Vector(4, 2, 2), Vector(4, 2, 2))
    assert(math.abs(s) < 1e-12)
  }

  test("chi-square grows with separation") {
    val weak   = ClassSplit.ChiSquare.score(Vector(4, 3, 1), Vector(4, 1, 3))
    val strong = ClassSplit.ChiSquare.score(Vector(4, 4, 0), Vector(4, 0, 4))
    assert(strong > weak && weak > 0)
  }

  for (crit <- Seq[ClassSplit.ClassCriterion](ClassSplit.Gini, ClassSplit.Entropy, ClassSplit.ChiSquare)) {
    test(s"${crit.name}: best split finds the separating threshold") {
      val total = Vector(6.0, 3.0, 3.0)
      val got = ClassSplit.best(mp(separable), Feature("r", "x"), PredMap.empty, total, crit)
      assert(got.isDefined)
      val (sv, _, l, r) = got.get
      assert(sv == NumThreshold(2.0), s"${crit.name} chose $sv")
      assert(l == Vector(3.0, 3.0, 0.0) && r == Vector(3.0, 0.0, 3.0))
    }
  }

  test("categorical class split partitions by value") {
    val df = Seq(("a", 1), ("a", 1), ("b", 2), ("b", 2), ("c", 1)).toDF("x", "cls")
    val g = JoinGraph.single("r", Ann.lift(df, "cls", sr))
    val got = ClassSplit.best(mp(g), Feature("r", "x", CategoricalF), PredMap.empty,
      Vector(5.0, 3.0, 2.0), ClassSplit.Gini)
    assert(got.get._1 == CatValue("b"))
  }

  test("classification tree on separable data reaches pure leaves and predicts classes") {
    val trainer = new ClassificationTreeTrainer(mp(separable), Seq(Feature("r", "x")), maxLeaves = 4)
    val tree = trainer.train()
    assert(tree.numLeaves >= 2)
    assert(tree.predict(_ => 1.0) == 1.0) // x=1 → class 1
    assert(tree.predict(_ => 5.0) == 2.0) // x=5 → class 2
  }

  test("classification tree over a joined schema (factorized)") {
    // class determined by the dimension attribute
    val fact = Seq((1, 10), (1, 11), (2, 12), (2, 13), (3, 14), (3, 15)).toDF("k", "payload")
    val dim  = Seq((1, 5.0), (2, 50.0), (3, 55.0)).toDF("k", "d")
    val cls  = Seq((1, 10, 1), (1, 11, 1), (2, 12, 2), (2, 13, 2), (3, 14, 2), (3, 15, 2))
    val factCls = cls.toDF("k", "payload", "cls")
    val g = JoinGraph(
      Map("fact" -> Ann.lift(factCls, "cls", sr), "dim" -> Ann.one(dim, sr)),
      Seq(Edge("fact", "dim", Seq("k"))),
    )
    val tree = new ClassificationTreeTrainer(mp(g), Seq(Feature("dim", "d")), maxLeaves = 2).train()
    assert(tree.numLeaves == 2)
    val split = tree.root.asInstanceOf[TSplit]
    assert(split.feature == Feature("dim", "d"))
    assert(split.value == NumThreshold(5.0))
  }
}
