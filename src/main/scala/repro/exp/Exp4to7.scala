package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.data.{Galaxy, Star}
import repro.baseline.Materialize
import Bench._

/** T4 (paper Fig 10): scaling the number of features. The ML-library
  * baseline hits its (simulated, see DESIGN.md) memory wall while JoinBoost
  * scales linearly with a much lower slope. Paper: LightGBM slows >1.5× at
  * 25 features and OOMs (125 GB) at 50 features.
  */
object T4FeatureScaling {
  // ~3e6 cells ≈ the scaled-down stand-in for LightGBM's 125 GB limit
  val CellBudget = 3000000L

  def run(spark: SparkSession): String = {
    val nFact = (100000 * scale).toLong
    val rows = for (extra <- Seq(0, 3, 6, 9)) yield {
      val ds = Star.generate(spark, Star.Config(nFact, extraFeaturesPerDim = extra,
        includeCategorical = false)).persist()
      val nFeat = ds.features.size
      val (res, _) = joinBoostGbm(ds, nTrees = 2)
      val jbIter = res.iters.map(i => i.trainMs + i.updateMs).sum / res.iters.size
      val bl =
        try {
          val b = baselinePrepare(spark, ds, CellBudget, nFact)
          val (_, trainMs) = time(b.gbdt.boost(2, 0.1))
          f"${b.costs.totalMs + trainMs}%d"
        } catch { case Materialize.OutOfBudget(c, b) => s"OOM($c>$b)" }
      ds.relations.values.foreach(_.unpersist())
      Seq(nFeat, jbIter, bl)
    }
    header("T4", s"feature scaling, fact=$nFact rows, GBM 2 iterations (Fig 10)") + "\n" +
      fmtTable("T4 #features scaling",
        Seq("#features", "JoinBoost ms/iter", "baseline total ms (2 iters)"), rows) + "\n" +
      "paper shape: JoinBoost scales linearly (>10x lower slope); LightGBM OOMs at 50 features"
  }
}

/** T5 (paper Fig 11): scaling the database size (TPC-DS-lite: the star
  * generator's fact row count plays the scale factor). Paper: both scale
  * linearly, JoinBoost with ~10× lower slope; LightGBM OOMs at SF=25.
  */
object T5SizeScaling {
  val CellBudget = 2500000L

  def run(spark: SparkSession): String = {
    val rows = for (nFact <- Seq(50000L, 100000L, 200000L, 400000L).map(n => (n * scale).toLong)) yield {
      val ds = Star.generate(spark, Star.Config(nFact, includeCategorical = false)).persist()
      val (res, _) = joinBoostGbm(ds, nTrees = 2)
      val jbIter = res.iters.map(i => i.trainMs + i.updateMs).sum / res.iters.size
      val bl =
        try {
          val b = baselinePrepare(spark, ds, CellBudget, nFact)
          val (_, trainMs) = time(b.gbdt.boost(2, 0.1))
          f"${b.costs.totalMs + trainMs}%d"
        } catch { case Materialize.OutOfBudget(c, b) => s"OOM($c>$b)" }
      ds.relations.values.foreach(_.unpersist())
      Seq(nFact, jbIter, bl)
    }
    header("T5", "database size scaling (TPC-DS-lite dial), GBM 2 iterations (Fig 11)") + "\n" +
      fmtTable("T5 DB size scaling",
        Seq("fact rows", "JoinBoost ms/iter", "baseline total ms (2 iters)"), rows) + "\n" +
      "paper shape: linear scaling, JoinBoost lower slope; LightGBM OOMs at SF=25"
  }
}

/** T6 (paper Figs 12/13 + Fig 18): parallelism. Inter-query parallelism is
  * measured directly (paper: −28% GBM, −35% RF). Cluster scaling (Figs
  * 12/13) has no multi-node substrate in this container; the shuffle-
  * partition sweep is the single-process proxy (see DESIGN.md), plus the
  * baseline's simulated OOM at the largest size even "on 4 machines".
  */
object T6Parallelism {
  def run(spark: SparkSession): String = {
    val nFact = (300000 * scale).toLong
    val ds = Star.generate(spark, Star.Config(nFact, includeCategorical = false)).persist()

    def gbm(par: Int): Long = joinBoostGbm(ds, nTrees = 3, featureParallelism = par)._2
    def rf(par: Int): Long = {
      val (_, ms) = time {
        new RandomForest(ds.annotated(), "sales", ds.features,
          RFParams(nTrees = 4, sampleRate = 0.1, featureRate = 0.8,
            tree = TreeParams(maxLeaves = 8, featureParallelism = if (par > 1) 2 else 1),
            treeParallelism = par)).train()
      }
      ms
    }

    val gbmSeq = gbm(1); val gbmPar = gbm(8)
    val rfSeq  = rf(1);  val rfPar  = rf(4)

    def tree(shuffle: Int): Long = {
      spark.conf.set("spark.sql.shuffle.partitions", shuffle)
      val mp = new MessagePassing(ds.annotated(), VarianceSemiring, new MessageCache(CacheMode.Shared))
      val (_, ms) = time(new FactorizedTreeTrainer(mp, ds.features,
        TreeParams(maxLeaves = 8, featureParallelism = 8)).train())
      ms
    }
    val t4  = tree(4)
    val t16 = tree(16)
    spark.conf.set("spark.sql.shuffle.partitions",
      sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "8"))

    header("T6", s"parallelism, fact=$nFact rows (Fig 18 + Figs 12/13 proxy)") + "\n" +
      fmtTable("T6 inter-query parallelism",
        Seq("workload", "sequential ms", "parallel ms", "reduction"),
        Seq(
          Seq("GBM 3 iters", gbmSeq, gbmPar, f"${100.0 * (gbmSeq - gbmPar) / gbmSeq}%.0f%% (paper 28%%)"),
          Seq("RF 4 trees", rfSeq, rfPar, f"${100.0 * (rfSeq - rfPar) / rfSeq}%.0f%% (paper 35%%)"),
        )) + "\n" +
      fmtTable("T6 cluster-scaling proxy (shuffle partitions)",
        Seq("partitions", "1 tree ms"),
        Seq(Seq(4, t4), Seq(16, t16))) + "\n" +
      "paper shape: parallelism cuts training; small clusters add shuffle overhead before scaling helps"
  }
}

/** T7 (paper Fig 14): gradient boosting over the galaxy schema with
  * Clustered Predicate Trees. The M-N join is prohibitive to materialize
  * (paper: IMDB R⋈ > 1 TB), so ML libraries cannot run at all; JoinBoost
  * scales linearly per tree.
  */
object T7Galaxy {
  val CellBudget = 5000000L

  def run(spark: SparkSession): String = {
    val nCast = (100000 * scale).toLong
    val ds = Galaxy.generate(spark, Galaxy.Config(
      nPerson = 2000, nMovie = 2000, nCast = nCast, infoPerPerson = 5, infoPerMovie = 5)).persist()
    val wideRows = nCast * 5 * 5 // exact by construction
    val blowup = wideRows.toDouble / nCast

    val mlLibrary =
      try { Materialize.checkBudget(wideRows, ds.features.size + 1, CellBudget); "would run" }
      catch { case Materialize.OutOfBudget(c, b) => s"cannot run (join $c cells > $b)" }

    val (res, totalMs) = time {
      new GradientBoosting(
        ds.annotated(), ds.yRelation, ds.clusters, ds.features,
        BoostParams(nTrees = 6, clusterRotation = true,
          tree = TreeParams(maxLeaves = 8, featureParallelism = 8)),
        new MemSwap,
      ).train()
    }
    val rows = res.iters.zipWithIndex.map { case (it, i) =>
      Seq(i + 1, it.cluster, it.trainMs, it.updateMs, it.trainMs + it.updateMs)
    }
    header("T7", s"galaxy GBM with CPT, cast=$nCast rows, R⋈=$wideRows rows (${blowup}x blow-up) (Fig 14)") + "\n" +
      s"ML-library baseline: $mlLibrary (paper: LightGBM cannot run, join > 1TB)\n" +
      fmtTable("T7 per-tree cost (linear in #iterations per paper)",
        Seq("tree", "cluster fact", "train ms", "update ms", "total ms"), rows) + "\n" +
      f"total: $totalMs ms for 6 trees; mean per tree ${totalMs / 6.0}%.0f ms"
  }
}
