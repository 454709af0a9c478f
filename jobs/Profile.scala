package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.data.Star

/** Ad-hoc latency profiling of the factorized training query workload. */
object Profile {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder
      .master("local[*]")
      .appName("profile")
      .config("spark.sql.shuffle.partitions", "8")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .config("spark.ui.enabled", false)
      .getOrCreate()
    spark.sparkContext.setLogLevel("WARN")

    def bench(tag: String): Unit = {
      val ds = Star.generate(spark, Star.Config(nFact = 2000, dimRows = 40, includeCategorical = false)).persist()
      val g  = ds.annotated()
      val metrics = new Metrics
      val mp = new MessagePassing(g, VarianceSemiring, new MessageCache(CacheMode.Shared, metrics = metrics), metrics)

      // single aggregate query latency
      for (i <- 1 to 3) {
        val t0 = System.nanoTime
        mp.aggregate("dates", Seq("f_dates"), PredMap.empty).collect()
        println(f"$tag agg#$i: ${(System.nanoTime - t0) / 1e6}%.0f ms")
      }
      val t0 = System.nanoTime
      val tree = new FactorizedTreeTrainer(mp, ds.features, TreeParams(maxLeaves = 8)).train()
      val ms = (System.nanoTime - t0) / 1e6
      val s = metrics.snapshot
      println(f"$tag tree: $ms%.0f ms, leaves=${tree.numLeaves}, splitQ=${s.splitQueries} (avg ${s.splitMs.sum.toDouble / s.splitMs.size}%.0f ms), msgQ=${s.messageQueries} (avg ${s.messageMs.sum.toDouble / s.messageMs.size}%.0f ms), hits=${s.cacheHits}")
      ds.relations.values.foreach(_.unpersist())
    }

    spark.conf.set("spark.sql.codegen.wholeStage", "false")
    spark.conf.set("spark.sql.adaptive.enabled", "false")
    bench("none")
    bench("none(warm)")
    spark.stop()
  }
}
