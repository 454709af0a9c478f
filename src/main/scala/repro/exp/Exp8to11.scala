package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.data.Star
import repro.baseline.{InMemoryGBDT, MadlibLikeTrainer, WideTrainers}
import Bench._

/** T8 (paper Fig 5 + Fig 15): residual-update physical strategies. Paper:
  * Naive (materialize U, re-join, rewrite) ≫ CREATE (full-table rewrite,
  * grows with payload width k) ≫ column swap ≈ LightGBM's raw parallel
  * array write. In Spark, MemSwap (cached-DataFrame swap) is the column-swap
  * analogue and SwapNarrow is the DP analogue (narrow update, but every
  * later query pays a rid-join).
  */
object T8ResidualStrategies {
  def run(spark: SparkSession): String = {
    val nFact = (500000 * scale).toLong

    def iterate(k: Int, strategy: ResidualStrategy): (Long, Long) = {
      val ds = Star.generate(spark, Star.Config(nFact, extraFactCols = k,
        includeCategorical = false)).persist()
      val (res, _) = joinBoostGbm(ds, nTrees = 1, strategy = strategy)
      ds.relations.values.foreach(_.unpersist())
      (res.iters.head.trainMs, res.iters.head.updateMs)
    }

    // LightGBM reference: a parallel write to a flat in-memory array
    val arr = Array.fill(nFact.toInt)(1.0)
    val arrayMs = InMemoryGBDT.parallelResidualUpdate(arr, _ => 0.5)

    iterate(0, new DiskCreate(spark)) // warm-up: parquet writer init + JIT

    val rows = Seq(
      { val (t, u) = iterate(0, new MemSwap);           Seq("MemSwap (≈D-Swap)", 0, t, u) },
      { val (t, u) = iterate(0, new SwapNarrow("sid")); Seq("SwapNarrow (≈DP)", 0, t, u) },
      { val (t, u) = iterate(0, new DiskCreate(spark));  Seq("DiskCreate", 0, t, u) },
      { val (t, u) = iterate(10, new DiskCreate(spark)); Seq("DiskCreate", 10, t, u) },
      { val (t, u) = iterate(20, new DiskCreate(spark)); Seq("DiskCreate", 20, t, u) },
      { val (t, u) = iterate(0, new NaiveJoin(spark));   Seq("NaiveJoin (U⋈F)", 0, t, u) },
    )
    header("T8", s"residual update strategies, fact=$nFact rows, 1 GBM iteration (Figs 5/15)") + "\n" +
      fmtTable("T8 residual update strategies",
        Seq("strategy", "extra cols k", "train ms", "update ms"), rows) + "\n" +
      s"reference parallel array write (LightGBM analogue): $arrayMs ms\n" +
      "paper shape: naive >> create (grows with k) >> swap ≈ array write; DP-style narrow swap " +
      "keeps updates cheap but slows the training queries (rid-join)"
  }
}

/** T9 (paper Fig 16a): vs LMFAO. Naive = materialized join, no
  * factorization; Batch = LMFAO's within-node sharing (our PerNode cache,
  * standing in for LMFAO itself — see DESIGN.md); JoinBoost adds cross-node
  * message caching. Paper: caching ≈3× over Batch; Batch ≈2× over Naive;
  * JoinBoost ≈1.9× over LMFAO's compiled engine.
  */
object T9Lmfao {
  def run(spark: SparkSession): String = {
    // paper setup: 18 features over 6 relations — the Naive/Batch gap comes
    // from #features ≫ #join edges, so impute 2 extra features per dim
    val nFact = (600000 * scale).toLong
    val params = TreeParams(maxLeaves = 8, maxDepth = 10, featureParallelism = 8)
    val ds = Star.generate(spark, Star.Config(nFact, extraFeaturesPerDim = 2,
      includeCategorical = false)).persist()

    def factorized(mode: CacheMode): (Long, MetricsSnapshot) = {
      val metrics = new Metrics
      val mp = new MessagePassing(ds.annotated(), VarianceSemiring,
        new MessageCache(mode, metrics = metrics), metrics)
      val ms = time(new FactorizedTreeTrainer(mp, ds.features, params).train())._2
      (ms, metrics.snapshot)
    }

    factorized(CacheMode.PerNode) // warm-up: JIT + generator materialization
    val naiveM = new Metrics
    val naive  = time(WideTrainers.naiveTree(ds, params, naiveM))._2
    val (perNode, perNodeM) = factorized(CacheMode.PerNode)
    val (shared, sharedM)   = factorized(CacheMode.Shared)

    header("T9", s"decision tree (16 leaves, depth≤10), fact=$nFact rows (Fig 16a)") + "\n" +
      fmtTable("T9 vs LMFAO-style training",
        Seq("variant", "train ms", "msg queries computed", "scans of fact-sized data", "vs JoinBoost"),
        Seq(
          Seq("JoinBoost (shared msg cache)", shared, sharedM.messageQueries, sharedM.messageQueries, "1.00x"),
          Seq("Batch (per-node, ≈LMFAO)", perNode, perNodeM.messageQueries, perNodeM.messageQueries,
            f"${perNode.toDouble / shared}%.2fx (paper ~3x; vs LMFAO engine ~1.9x)"),
          Seq("Naive (materialized join)", naive, 0L, naiveM.snapshot.splitQueries,
            f"${naive.toDouble / shared}%.2fx (paper: Batch ~2x faster than Naive)"),
        )) + "\n" +
      "work-sharing evidence (engine-independent): computed message queries drop with the shared cache;\n" +
      "Naive instead scans the full wide table once per split query"
  }
}

/** T10 (paper Fig 16b): vs MADLib — non-factorized, row-at-a-time UDF-style
  * aggregation over the materialized join, no inter-query parallelism.
  * Paper: JoinBoost ~16× faster on 10k rows of real MADLib; our proxy runs
  * on the same engine, so the input is sized above the per-query latency
  * floor instead (see DESIGN.md).
  */
object T10Madlib {
  def run(spark: SparkSession): String = {
    val nFact = (1500000 * scale).toLong
    val params = TreeParams(maxLeaves = 8, maxDepth = 10, featureParallelism = 8)
    val ds = Star.generate(spark, Star.Config(nFact, includeCategorical = false)).persist()

    val mp = new MessagePassing(ds.annotated(), VarianceSemiring, new MessageCache(CacheMode.Shared))
    val jb = time(new FactorizedTreeTrainer(mp, ds.features, params).train())._2
    val madlib = time(new MadlibLikeTrainer(ds, params.copy(featureParallelism = 1)).train())._2

    header("T10", s"decision tree (16 leaves), fact=$nFact rows (Fig 16b)") + "\n" +
      fmtTable("T10 vs MADLib-style training",
        Seq("variant", "train ms", "speedup"),
        Seq(
          Seq("JoinBoost", jb, "1.00x"),
          Seq("MADLib-like (row-at-a-time over materialized join)", madlib,
            f"${madlib.toDouble / jb}%.2fx slower (paper ~16x)"),
        ))
  }
}

/** T11 (paper Fig 20 / Appendix D.3): histogram cuboid. Few bins → tiny
  * cuboid → residual updates and split queries run on thousands of rows.
  * Paper: at bins=5 JoinBoost speeds up >100× at iteration 10 with a small
  * accuracy cost that more boosting recovers.
  */
object T11Cuboid {
  def run(spark: SparkSession): String = {
    val nFact  = (200000 * scale).toLong
    val nTrees = 5
    val ds = Star.generate(spark, Star.Config(nFact, includeCategorical = false)).persist()

    def cuboidRun(bins: Int): Seq[Any] = {
      val g = ds.annotated()
      val (built, buildMs) = time(Cuboid.build(g, ds.features, bins, VarianceSemiring))
      val (res, trainMs) = time {
        new GradientBoosting(
          built.graph, Cuboid.RelName, Seq(Cluster(Cuboid.RelName, Set(Cuboid.RelName))),
          built.features,
          BoostParams(nTrees = nTrees, tree = TreeParams(maxLeaves = 8, featureParallelism = 8)),
          new MemSwap,
        ).train()
      }
      val model = BoostedModel(res.model.baseScore, res.model.learningRate,
        res.model.trees.map(built.translate))
      val r = rmseOnWide(ds, _ => model.predictExpr(Joins.wideResolve))
      Seq(s"cuboid-$bins", built.rows, buildMs, trainMs, trainMs / nTrees, r)
    }

    val (res0, fullMs) = joinBoostGbm(ds, nTrees)
    val fullRmse = rmseOnWide(ds, _ => res0.model.predictExpr(Joins.wideResolve))

    val rows = Seq(cuboidRun(5), cuboidRun(10)) :+
      Seq("factorized (no cuboid)", nFact, 0L, fullMs, fullMs / nTrees, fullRmse)

    header("T11", s"histogram cuboid, fact=$nFact rows, GBM $nTrees iterations (Fig 20)") + "\n" +
      fmtTable("T11 cuboid bins sweep",
        Seq("method", "cuboid rows", "build ms", "train ms", "ms/iter", "rmse"), rows) + "\n" +
      "paper shape: bins=5 cuboid is dramatically faster per iteration with modest rmse cost"
  }
}
