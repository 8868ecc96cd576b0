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
val forkedJvm = Seq(
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

lazy val root: Project = (project in file("."))
  .settings(name := "repro")
  .settings(sparkClasspath: _*)
  .settings(offlineDeps)
  .settings(forkedJvm: _*)

// Compile every subproject in one shot (aggregation would be cyclic with
// jobs.dependsOn(root), so use an alias instead).
addCommandAlias("compileAll", ";compile;jobs/compile;bench/Test/compile")

// spark-submit entrypoints, one main per reproduced table; sources live
// directly in jobs/ per the repo layout convention.
lazy val jobs: Project = (project in file("jobs"))
  .dependsOn(root)
  .settings(name := "repro-jobs")
  .settings(sparkClasspath: _*)
  .settings(offlineDeps)
  .settings(forkedJvm: _*)
  .settings(
    sourcesInBase := false, // scalaSource below already covers the base dir
    Compile / scalaSource := baseDirectory.value,
  )

// Benchmark suites (sbt "bench/test"), one ScalaTest suite per table.
// Kept out of the root aggregate so `sbt test` stays fast.
lazy val bench: Project = (project in file("bench"))
  .dependsOn(root % "compile->compile;test->test")
  .settings(name := "repro-bench")
  .settings(sparkClasspath: _*)
  .settings(offlineDeps)
  .settings(forkedJvm: _*)
  .settings(
    sourcesInBase := false, // bench sources are Test-scoped (ScalaTest suites)
    Test / scalaSource := baseDirectory.value,
    // benches time per-round Spark jobs; fewer shuffle partitions keep the
    // fixed per-job overhead from swamping the algorithmic costs
    Test / envVars := Map("SPARK_SHUFFLE_PARTITIONS" -> "16"),
  )
