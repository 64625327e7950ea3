ThisBuild / scalaVersion := "2.13.17"
ThisBuild / organization := "repro"

// Spark jars come from the binary distribution baked into the image —
// the sealed container has no Maven/Ivy egress, so spark-sql etc. are
// NOT resolved coordinates but unmanaged jars on the compile classpath.
// Test-scope deps are pre-warmed in the image's coursier cache
// (COURSIER_MODE=offline); anything not listed here will fail to resolve.
// Spark 4 on JDK 17 needs the java.base internals opened in forked JVMs
// (date/time decoding reflects into sun.util.calendar etc.).
val sparkJvmFlags: Seq[String] = Seq(
  "java.lang", "java.lang.invoke", "java.lang.reflect", "java.io", "java.net",
  "java.nio", "java.util", "java.util.concurrent", "java.util.concurrent.atomic",
  "jdk.internal.ref", "sun.nio.ch", "sun.nio.cs", "sun.security.action",
  "sun.util.calendar",
).map(p => s"--add-opens=java.base/$p=ALL-UNNAMED") ++ Seq(
  "-Dspark.driver.host=127.0.0.1",
  "-Dspark.ui.enabled=false",
  s"-Xmx${sys.env.getOrElse("SPARK_DRIVER_MEM", "48g")}",
)

val sparkClasspath = Seq(
  Compile / unmanagedBase := file("/opt/spark/jars"),
  Test / unmanagedBase := file("/opt/spark/jars"),
  libraryDependencies ++= Seq(
    "org.scalatest"  %% "scalatest"   % "3.2.19" % Test,
    "org.scalacheck" %% "scalacheck"  % "1.18.0" % Test,
    "org.duckdb"     %  "duckdb_jdbc" % "1.0.0",
  ),
  // fork: in-process Spark under sbt mis-parses core-default.xml; a forked
  // JVM also keeps each test run's driver heap independent of sbt's.
  Compile / run / fork := true,
  Test / fork := true,
  Test / javaOptions ++= sparkJvmFlags,
  Compile / run / javaOptions ++= sparkJvmFlags,
  // One JVM per test run (not per suite) so a single SparkSession is reused.
  Test / parallelExecution := false,
)

lazy val root: Project = (project in file("."))
  .settings(name := "repro")
  .settings(sparkClasspath)

// spark-submit entrypoints, one per table/figure of the paper.
// Compile with `sbt "jobs/compile"`; not aggregated into root to avoid a
// load-time cycle with the dependsOn edge.
lazy val jobs: Project = (project in file("jobs"))
  .dependsOn(root)
  .settings(name := "repro-jobs")
  .settings(sparkClasspath)

// Benchmark suites, one per evaluation table; run with `sbt "bench/test"`.
// Not aggregated into root so `sbt test` stays fast.
lazy val bench = (project in file("bench"))
  .dependsOn(root % "compile->compile;test->test")
  .settings(name := "repro-bench")
  .settings(sparkClasspath)
