ThisBuild / scalaVersion := "2.13.17"
ThisBuild / organization := "repro"

// Test-scope deps are pre-warmed in the image's coursier cache
// (COURSIER_MODE=offline); anything not listed here will fail to resolve.
val testDeps = Seq(
  "org.scalatest"  %% "scalatest"   % "3.2.19" % Test,
  "org.scalacheck" %% "scalacheck"  % "1.18.0" % Test,
  "org.duckdb"     %  "duckdb_jdbc" % "1.0.0",
)

val sharedSettings = Seq(
  // Spark jars come from the binary distribution baked into the image —
  // the sealed container has no Maven/Ivy egress, so spark-sql etc. are
  // NOT resolved coordinates but unmanaged jars on the compile classpath.
  Compile / unmanagedBase := file("/opt/spark/jars"),
  Test / unmanagedBase := file("/opt/spark/jars"),
  libraryDependencies ++= testDeps,
  // fork: in-process Spark under sbt mis-parses core-default.xml; a forked
  // JVM also keeps each test run's driver heap independent of sbt's.
  Compile / run / fork := true,
  Test / fork := true,
  Test / javaOptions ++= Seq(
    "-Dspark.driver.host=127.0.0.1",
    "-Dspark.ui.enabled=false",
    s"-Xmx${sys.env.getOrElse("SPARK_DRIVER_MEM", "48g")}",
  ),
  // One JVM per test run (not per suite) so a single SparkSession is reused.
  Test / parallelExecution := false,
)

lazy val root = (project in file("."))
  .settings(sharedSettings)
  .settings(
    name := "repro",
    // spark-submit entrypoints live in jobs/ (one object per table/figure).
    Compile / unmanagedSourceDirectories += baseDirectory.value / "jobs",
  )

// Benchmark harnesses run as ScalaTest suites (`sbt "bench/test"`); they
// reuse the shared SparkSession trait from the root test classpath.
lazy val bench = (project in file("bench"))
  .dependsOn(root % "compile->compile;test->test")
  .settings(sharedSettings)
  .settings(name := "repro-bench")
