package repro.jobs

/** RDD-level job floor vs DataFrame floor. */
object Floor2 {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("floor2")
    val sc = spark.sparkContext
    def t(tag: String, n: Int)(f: => Unit): Unit = {
      (1 to 3).foreach(_ => f)
      val t0 = System.nanoTime
      (1 to n).foreach(_ => f)
      println(f"$tag: ${(System.nanoTime - t0) / 1e6 / n}%.1f ms")
    }
    val r1 = sc.parallelize(1 to 100, 1).cache(); r1.count()
    val r16 = sc.parallelize(1 to 100, 16).cache(); r16.count()
    t("rdd count 1 partition", 30)(r1.count())
    t("rdd count 16 partitions", 30)(r16.count())
    t("rdd reduceByKey 1p", 20)(r1.map(x => (x % 5, x)).reduceByKey(_ + _, 1).collect())
    import spark.implicits._
    val df = (1 to 100).toDF("x").localCheckpoint(true)
    t("df collect", 20)(df.collect())
    t("df agg", 20)(df.agg(org.apache.spark.sql.functions.sum("x")).collect())
    spark.stop()
  }
}
