package repro.jobs

import org.apache.spark.sql.functions._

/** Measures Spark's per-query floor for tiny aggregates under various confs. */
object Floor {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("floor")
    import spark.implicits._
    val df = (1 to 1000).map(i => (i % 50, i.toDouble)).toDF("k", "v").localCheckpoint(true)

    def run(tag: String): Unit = {
      // warmup
      (1 to 3).foreach(_ => df.groupBy("k").agg(sum("v")).collect())
      val t0 = System.nanoTime
      val n = 20
      (1 to n).foreach(_ => df.groupBy("k").agg(sum("v")).collect())
      println(f"$tag: ${(System.nanoTime - t0) / 1e6 / n}%.1f ms per tiny groupBy")
      val t1 = System.nanoTime
      (1 to n).foreach(_ => df.agg(sum("v")).collect())
      println(f"$tag: ${(System.nanoTime - t1) / 1e6 / n}%.1f ms per tiny global agg")
    }

    run("partitions=8")
    spark.conf.set("spark.sql.shuffle.partitions", "1")
    run("partitions=1")
    spark.conf.set("spark.sql.shuffle.partitions", "8")
    spark.conf.set("spark.sql.codegen.wholeStage", "true")
    run("codegen on")
    spark.stop()
  }
}
