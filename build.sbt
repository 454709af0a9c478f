ThisBuild / scalaVersion := "2.13.17"
ThisBuild / organization := "repro"

// Spark jars come from the binary distribution baked into the image —
// the sealed container has no Maven/Ivy egress, so spark-sql etc. are
// NOT resolved coordinates but unmanaged jars on the compile classpath.
val sparkJars = Seq(
  Compile / unmanagedBase := file("/opt/spark/jars"),
  Test    / unmanagedBase := file("/opt/spark/jars"),
)

// Test-scope deps are pre-warmed in the image's coursier cache
// (COURSIER_MODE=offline); anything not listed here will fail to resolve.
val testDeps = libraryDependencies ++= Seq(
  "org.scalatest"  %% "scalatest"   % "3.2.19" % Test,
  "org.scalacheck" %% "scalacheck"  % "1.18.0" % Test,
  "org.duckdb"     %  "duckdb_jdbc" % "1.0.0",
)

// Spark-on-JDK17 module opens (same set spark-submit passes).
val sparkJvmOpens = Seq(
  "java.base/java.lang", "java.base/java.lang.invoke", "java.base/java.lang.reflect",
  "java.base/java.io", "java.base/java.net", "java.base/java.nio",
  "java.base/java.util", "java.base/java.util.concurrent",
  "java.base/sun.nio.ch", "java.base/sun.nio.cs", "java.base/sun.security.action",
  "java.base/sun.util.calendar",
).map(p => s"--add-opens=$p=ALL-UNNAMED")

val sparkJvmFlags = sparkJvmOpens ++ Seq(
  "-Dspark.driver.host=127.0.0.1",
  "-Dspark.ui.enabled=false",
  // The training workload is hundreds of small SQL queries; whole-stage
  // codegen JIT compilation and AQE re-planning dominate their latency at
  // unit/bench scale, so both are disabled (plans are simple SPJA).
  "-Dspark.sql.codegen.wholeStage=false",
  "-Dspark.sql.adaptive.enabled=false",
  s"-Xmx${sys.env.getOrElse("SPARK_DRIVER_MEM", "48g")}",
)

// fork: in-process Spark under sbt mis-parses core-default.xml; a forked
// JVM also keeps each test run's driver heap independent of sbt's.
val forkSettings = Seq(
  Compile / run / fork := true,
  Compile / run / javaOptions ++= sparkJvmFlags,
  Test / fork := true,
  Test / javaOptions ++= sparkJvmFlags,
  // One JVM per test run (not per suite) so a single SparkSession is reused.
  Test / parallelExecution := false,
  // Unit/bench inputs are small; fewer shuffle partitions cut fixed per-query
  // overhead dramatically. Override by exporting SPARK_SHUFFLE_PARTITIONS.
  Test / envVars ++= Map(
    "SPARK_SHUFFLE_PARTITIONS" -> sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "8"),
  ),
)

lazy val root = (project in file("."))
  .settings(name := "repro")
  .settings(sparkJars: _*)
  .settings(testDeps)
  .settings(forkSettings: _*)

// Benchmark suites (one per evaluation table): `sbt -batch "bench/test"`.
lazy val bench = (project in file("bench"))
  .dependsOn(root % "compile->compile;test->test")
  .settings(name := "repro-bench")
  .settings(sparkJars: _*)
  .settings(testDeps)
  .settings(forkSettings: _*)

// spark-submit entrypoints, sources directly under jobs/.
lazy val jobs = (project in file("jobs"))
  .dependsOn(root)
  .settings(
    name := "repro-jobs",
    Compile / scalaSource := baseDirectory.value,
  )
  .settings(sparkJars: _*)
  .settings(forkSettings: _*)
