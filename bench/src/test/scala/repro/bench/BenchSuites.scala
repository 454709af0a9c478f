package repro.bench

import repro.SparkSpec
import repro.exp._

/** One benchmark suite per evaluation table (T1–T11, see DESIGN.md §2).
  * Each prints the paper-vs-measured report consumed by EXPERIMENTS.md and
  * asserts the headline *shape* (loose bounds — these are benchmarks, not
  * microsecond-exact tests). Scale with BENCH_SCALE (default 1.0).
  */
class T1RandomForestBench extends SparkSpec {
  test("T1: random forest vs ML library (Fig 8a)") {
    val report = T1RandomForest.run(spark)
    println(report)
    assert(report.contains("JoinBoost(Spark)"))
  }
}

class T2GradientBoostingBench extends SparkSpec {
  test("T2: gradient boosting vs ML library (Fig 8b/8c)") {
    val report = T2GradientBoosting.run(spark)
    println(report)
    // Fig 8c: same algorithm → near-identical rmse
    val gap = raw"rmse gap \|JoinBoost - baseline\| = ([0-9.eE+-]+)".r
      .findFirstMatchIn(report).get.group(1).toDouble
    assert(gap < 1.0, s"models diverged: rmse gap $gap")
  }
}

class T3QueryCountBench extends SparkSpec {
  test("T3: query counts and latency histogram (Fig 9)") {
    val report = T3QueryCount.run(spark)
    println(report)
    assert(report.contains("split queries"))
  }
}

class T4FeatureScalingBench extends SparkSpec {
  test("T4: #features scaling with simulated baseline OOM (Fig 10)") {
    val report = T4FeatureScaling.run(spark)
    println(report)
    assert(report.contains("OOM"), "largest feature count should exceed the baseline budget")
  }
}

class T5SizeScalingBench extends SparkSpec {
  test("T5: DB size scaling with simulated baseline OOM (Fig 11)") {
    val report = T5SizeScaling.run(spark)
    println(report)
    assert(report.contains("OOM"), "largest size should exceed the baseline budget")
  }
}

class T6ParallelismBench extends SparkSpec {
  test("T6: inter-query parallelism and cluster proxy (Figs 12/13/18)") {
    val report = T6Parallelism.run(spark)
    println(report)
    assert(report.contains("GBM 3 iters"))
  }
}

class T7GalaxyBench extends SparkSpec {
  test("T7: galaxy schema via CPT; ML library cannot run (Fig 14)") {
    val report = T7Galaxy.run(spark)
    println(report)
    assert(report.contains("cannot run"), "baseline must be gated out by the blown-up join")
  }
}

class T8ResidualUpdateBench extends SparkSpec {
  test("T8: residual update strategies (Figs 5/15)") {
    val report = T8ResidualStrategies.run(spark)
    println(report)
    val update = raw"(\S+[^ ]*) +(\d+) +(\d+) +(\d+)".r
    val rows = report.linesIterator.toSeq
    def updateMs(tag: String): Long =
      rows.find(_.startsWith(tag)).map(_.trim.split("\\s+").last.toLong).get
    assert(updateMs("NaiveJoin") > updateMs("MemSwap"),
      "naive U-join rewrite must cost more than the cached swap")
  }
}

class T9LmfaoBench extends SparkSpec {
  test("T9: message caching vs Batch vs Naive (Fig 16a)") {
    val report = T9Lmfao.run(spark)
    println(report)
    // engine-independent shape: the shared cache must compute substantially
    // fewer message queries than per-node batching (paper: ~half cached)
    def msgs(tag: String): Long =
      report.linesIterator.find(_.startsWith(tag)).get.trim.split("\\s{2,}")(2).trim.toLong
    assert(msgs("JoinBoost") * 2 <= msgs("Batch") * 15 / 10,
      s"expected ≥25% fewer computed messages: ${msgs("JoinBoost")} vs ${msgs("Batch")}")
  }
}

class T10MadlibBench extends SparkSpec {
  test("T10: vs MADLib-like non-factorized training (Fig 16b)") {
    val report = T10Madlib.run(spark)
    println(report)
    def ms(tag: String): Long =
      report.linesIterator.find(_.startsWith(tag)).get.trim.split("\\s+")
        .collectFirst { case t if t.forall(_.isDigit) && t.length > 1 => t.toLong }.get
    assert(ms("MADLib-like") > ms("JoinBoost"), "re-joining per query must be slower")
  }
}

class T11CuboidBench extends SparkSpec {
  test("T11: histogram cuboid bins sweep (Fig 20)") {
    val report = T11Cuboid.run(spark)
    println(report)
    def msPerIter(tag: String): Double =
      report.linesIterator.find(_.startsWith(tag)).get.trim.split("\\s++").dropRight(1).last.toDouble
    assert(msPerIter("cuboid-5") < msPerIter("factorized"),
      "5-bin cuboid iterations must beat full factorized iterations")
  }
}
