ThisBuild / scalaVersion := "2.13.17"
ThisBuild / organization := "repro"

val testDeps = Seq(
  "org.scalatest"  %% "scalatest"   % "3.2.19" % Test,
  "org.scalacheck" %% "scalacheck"  % "1.18.0" % Test,
)

val commonTestSettings = Seq(
  // Spark jars come from the binary distribution baked into the image —
  // the sealed container has no Maven/Ivy egress, so spark-sql etc. are
  // NOT resolved coordinates but unmanaged jars on the compile classpath.
  Compile / unmanagedBase := file("/opt/spark/jars"),
  Test / unmanagedBase := file("/opt/spark/jars"),
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
  .settings(
    name := "repro",
    libraryDependencies ++= testDeps :+ ("org.duckdb" % "duckdb_jdbc" % "1.0.0"),
    // spark-submit entrypoints live in jobs/, one object per paper table.
    Compile / unmanagedSourceDirectories += baseDirectory.value / "jobs",
  )
  .settings(commonTestSettings)

// Benchmark harness: one ScalaTest suite per paper table, run via `sbt bench/test`.
lazy val bench = (project in file("bench"))
  .dependsOn(root % "compile->compile;test->test")
  .settings(
    name := "bench",
    libraryDependencies ++= testDeps,
  )
  .settings(commonTestSettings)
