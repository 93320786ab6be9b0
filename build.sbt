ThisBuild / scalaVersion := "2.13.17"
ThisBuild / organization := "repro"

// Spark jars come from the binary distribution baked into the image —
// the sealed container has no Maven/Ivy egress, so spark-sql etc. are
// NOT resolved coordinates but unmanaged jars on the compile classpath.
val sparkClasspath = Seq(
  Compile / unmanagedBase := file("/opt/spark/jars"),
  Test / unmanagedBase := file("/opt/spark/jars"),
)

// Test-scope deps are pre-warmed in the image's coursier cache
// (COURSIER_MODE=offline); anything not listed here will fail to resolve.
val offlineDeps = libraryDependencies ++= Seq(
  "org.scalatest"  %% "scalatest"   % "3.2.19" % Test,
  "org.scalacheck" %% "scalacheck"  % "1.18.0" % Test,
  "org.duckdb"     %  "duckdb_jdbc" % "1.0.0",
)

// fork: in-process Spark under sbt mis-parses core-default.xml; a forked
// JVM also keeps each test run's driver heap independent of sbt's.
// JPMS opens Spark 4 needs on JDK 17+ (same set spark-class passes).
val sparkModuleOpens = Seq(
  "java.base/java.lang", "java.base/java.lang.invoke", "java.base/java.lang.reflect",
  "java.base/java.io", "java.base/java.net", "java.base/java.nio",
  "java.base/java.util", "java.base/java.util.concurrent",
  "java.base/java.util.concurrent.atomic", "java.base/jdk.internal.ref",
  "java.base/sun.nio.ch", "java.base/sun.nio.cs", "java.base/sun.security.action",
  "java.base/sun.util.calendar", "java.security.jgss/sun.security.krb5",
).map(p => s"--add-opens=$p=ALL-UNNAMED")

val forkSettings = Seq(
  Compile / run / fork := true,
  Test / fork := true,
  Compile / run / javaOptions ++= sparkModuleOpens,
  Test / javaOptions ++= sparkModuleOpens,
  Test / javaOptions ++= Seq(
    "-Dspark.driver.host=127.0.0.1",
    "-Dspark.ui.enabled=false",
    // Safety net: deeply nested materialized plans must not spend minutes
    // stringifying themselves for listener events.
    "-Dspark.sql.maxPlanStringLength=100000",
    s"-Xmx${sys.env.getOrElse("SPARK_DRIVER_MEM", "48g")}",
  ),
  Compile / run / javaOptions ++= Seq(
    "-Dspark.driver.host=127.0.0.1",
    "-Dspark.ui.enabled=false",
    "-Dspark.sql.maxPlanStringLength=100000",
  ),
  // One JVM per test run (not per suite) so a single SparkSession is reused.
  Test / parallelExecution := false,
)

lazy val root: Project = (project in file("."))
  .settings(name := "repro")
  .settings(sparkClasspath: _*)
  .settings(offlineDeps)
  .settings(forkSettings: _*)

// spark-submit entrypoints, one per reproduced table/figure.
lazy val jobs: Project = (project in file("jobs"))
  .dependsOn(root)
  .settings(name := "repro-jobs")
  .settings(sparkClasspath: _*)
  .settings(offlineDeps)
  .settings(forkSettings: _*)

// Benchmark suites, one per reproduced table/figure. Run via `sbt bench/test`
// (deliberately NOT aggregated into root so `sbt test` stays fast).
lazy val bench: Project = (project in file("bench"))
  .dependsOn(root % "compile->compile;test->test")
  .settings(name := "repro-bench")
  .settings(sparkClasspath: _*)
  .settings(offlineDeps)
  .settings(forkSettings: _*)
  .settings(
    // The paper's experimental setup (§4.1): queries execute on a single CPU
    // core over in-memory data at SF 1. Overridable via the same env vars.
    Test / envVars ++= Map(
      "SPARK_MASTER" -> sys.env.getOrElse("SPARK_MASTER", "local[1]"),
      "SPARK_SHUFFLE_PARTITIONS" -> sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "4"),
      "BENCH_SF" -> sys.env.getOrElse("BENCH_SF", "1.0"),
    ),
  )
