package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp._

/** spark-submit entrypoints, one per evaluation table (DESIGN.md §2).
  * Usage: spark-submit --class repro.jobs.T1Job <jar>   (or sbt "jobs/runMain …")
  */
object JobSession {
  def create(name: String): SparkSession = {
    val s = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "8"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .config("spark.sql.codegen.wholeStage", false)
      .config("spark.sql.adaptive.enabled", false)
      .config("spark.ui.enabled", false)
      .getOrCreate()
    s.sparkContext.setLogLevel("WARN")
    s
  }

  def runAndPrint(name: String)(f: SparkSession => String): Unit = {
    val spark = create(name)
    try println(f(spark)) finally spark.stop()
  }
}

object T1Job  { def main(a: Array[String]): Unit = JobSession.runAndPrint("t1")(T1RandomForest.run) }
object T2Job  { def main(a: Array[String]): Unit = JobSession.runAndPrint("t2")(T2GradientBoosting.run) }
object T3Job  { def main(a: Array[String]): Unit = JobSession.runAndPrint("t3")(T3QueryCount.run) }
object T4Job  { def main(a: Array[String]): Unit = JobSession.runAndPrint("t4")(T4FeatureScaling.run) }
object T5Job  { def main(a: Array[String]): Unit = JobSession.runAndPrint("t5")(T5SizeScaling.run) }
object T6Job  { def main(a: Array[String]): Unit = JobSession.runAndPrint("t6")(T6Parallelism.run) }
object T7Job  { def main(a: Array[String]): Unit = JobSession.runAndPrint("t7")(T7Galaxy.run) }
object T8Job  { def main(a: Array[String]): Unit = JobSession.runAndPrint("t8")(T8ResidualStrategies.run) }
object T9Job  { def main(a: Array[String]): Unit = JobSession.runAndPrint("t9")(T9Lmfao.run) }
object T10Job { def main(a: Array[String]): Unit = JobSession.runAndPrint("t10")(T10Madlib.run) }
object T11Job { def main(a: Array[String]): Unit = JobSession.runAndPrint("t11")(T11Cuboid.run) }

/** Runs every experiment in sequence (the full evaluation reproduction). */
object AllJobs {
  def main(a: Array[String]): Unit = JobSession.runAndPrint("all") { spark =>
    Seq(
      T1RandomForest.run(spark), T2GradientBoosting.run(spark), T3QueryCount.run(spark),
      T4FeatureScaling.run(spark), T5SizeScaling.run(spark), T6Parallelism.run(spark),
      T7Galaxy.run(spark), T8ResidualStrategies.run(spark), T9Lmfao.run(spark),
      T10Madlib.run(spark), T11Cuboid.run(spark),
    ).mkString("\n\n")
  }
}
