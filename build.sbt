ThisBuild / scalaVersion := "2.13.17"
ThisBuild / organization := "repro"

// Spark jars come from the binary distribution baked into the image —
// the sealed container has no Maven/Ivy egress, so spark-sql etc. are
// NOT resolved coordinates but unmanaged jars on the compile classpath.
val sparkJars = Seq(
  Compile / unmanagedBase := file("/opt/spark/jars"),
  Test    / unmanagedBase := file("/opt/spark/jars"),
)

// Tiny synthetic data: 64 shuffle partitions per stage is pure scheduling
// overhead. Tests/benches default to 16 unless the caller overrides.
val sparkTestEnv = Map(
  "SPARK_SHUFFLE_PARTITIONS" -> sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "16"),
)

val sparkTestOptions = Seq(
  "-Dspark.driver.host=127.0.0.1",
  "-Dspark.ui.enabled=false",
  s"-Xmx${sys.env.getOrElse("SPARK_DRIVER_MEM", "48g")}",
)

lazy val root = (project in file("."))
  .settings(sparkJars: _*)
  .settings(
    name := "repro",
    // Test-scope deps are pre-warmed in the image's coursier cache
    // (COURSIER_MODE=offline); anything not listed here will fail to resolve.
    libraryDependencies ++= Seq(
      "org.scalatest"  %% "scalatest"   % "3.2.19" % Test,
      "org.scalacheck" %% "scalacheck"  % "1.18.0" % Test,
      "org.duckdb"     %  "duckdb_jdbc" % "1.0.0",
    ),
    // spark-submit entrypoints live in jobs/, one object per paper table.
    Compile / unmanagedSourceDirectories += baseDirectory.value / "jobs",
    // fork: in-process Spark under sbt mis-parses core-default.xml; a forked
    // JVM also keeps each test run's driver heap independent of sbt's.
    Compile / run / fork := true,
    Test / fork := true,
    Test / javaOptions ++= sparkTestOptions,
    Test / envVars ++= sparkTestEnv,
    // One JVM per test run (not per suite) so a single SparkSession is reused.
    Test / parallelExecution := false,
  )

// Benchmark harness: one suite per paper table, each printing the rows the
// paper reports (run with `sbt -batch "bench/test"`).
lazy val bench = (project in file("bench"))
  .dependsOn(root % "compile->compile;test->test")
  .settings(sparkJars: _*)
  .settings(
    name := "repro-bench",
    libraryDependencies ++= Seq(
      "org.scalatest" %% "scalatest" % "3.2.19" % Test,
    ),
    Test / fork := true,
    Test / javaOptions ++= sparkTestOptions,
    Test / envVars ++= sparkTestEnv,
    Test / parallelExecution := false,
  )
