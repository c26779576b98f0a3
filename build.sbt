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
val testDeps = Seq(
  libraryDependencies ++= Seq(
    "org.scalatest"  %% "scalatest"   % "3.2.19" % Test,
    "org.scalacheck" %% "scalacheck"  % "1.18.0" % Test,
    "org.duckdb"     %  "duckdb_jdbc" % "1.0.0",
  )
)

// fork: in-process Spark under sbt mis-parses core-default.xml; a forked
// JVM also keeps each test run's driver heap independent of sbt's.
val forkSettings = Seq(
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
  .settings(name := "repro")
  .settings(sparkJars ++ testDeps ++ forkSettings)

// spark-submit entrypoints, one object per reproduced table; sources live
// directly in jobs/*.scala.
lazy val jobs = (project in file("jobs"))
  .dependsOn(root)
  .settings(name := "repro-jobs")
  .settings(sparkJars ++ testDeps ++ forkSettings)
  .settings(
    sourcesInBase := false,
    Compile / scalaSource := baseDirectory.value,
  )

// Benchmark suites, one per table (T1..T8); sources live directly in
// bench/*.scala and run as ScalaTest so `sbt "bench/test"` regenerates
// every table.
lazy val bench = (project in file("bench"))
  .dependsOn(root % "compile->compile;test->test")
  .settings(name := "repro-bench")
  .settings(sparkJars ++ testDeps ++ forkSettings)
  .settings(
    sourcesInBase := false,
    Test / scalaSource := baseDirectory.value,
  )
