ThisBuild / scalaVersion := "2.13.17"
ThisBuild / organization := "repro"

// Spark jars come from the binary distribution baked into the image —
// the sealed container has no Maven/Ivy egress, so spark-sql etc. are
// NOT resolved coordinates but unmanaged jars on the compile classpath.
val sparkJars = file("/opt/spark/jars")

val testDeps = Seq(
  "org.scalatest"  %% "scalatest"   % "3.2.19" % Test,
  "org.scalacheck" %% "scalacheck"  % "1.18.0" % Test,
  "org.duckdb"     %  "duckdb_jdbc" % "1.0.0",
)

val jdk17Opens = Seq(
  "java.base/java.lang", "java.base/java.lang.invoke", "java.base/java.lang.reflect",
  "java.base/java.io", "java.base/java.net", "java.base/java.nio",
  "java.base/java.util", "java.base/java.util.concurrent",
  "java.base/java.util.concurrent.atomic", "java.base/sun.nio.ch",
  "java.base/sun.nio.cs", "java.base/sun.security.action", "java.base/sun.util.calendar",
).map(p => s"--add-opens=$p=ALL-UNNAMED")

val sparkRunSettings = Seq(
  Compile / unmanagedBase := sparkJars,
  Test    / unmanagedBase := sparkJars,
  // Test-scope deps are pre-warmed in the image's coursier cache
  // (COURSIER_MODE=offline); anything not listed here will fail to resolve.
  libraryDependencies ++= testDeps,
  // fork: in-process Spark under sbt mis-parses core-default.xml; a forked
  // JVM also keeps each test run's driver heap independent of sbt's.
  Compile / run / fork := true,
  Test / fork := true,
  // The add-opens set spark-class normally injects on JDK 17 — GraphX's
  // Kryo path needs java.nio reflective access.
  Test / javaOptions ++= jdk17Opens,
  Compile / run / javaOptions ++= jdk17Opens,
  Test / javaOptions ++= Seq(
    "-Dspark.driver.host=127.0.0.1",
    "-Dspark.ui.enabled=false",
    s"-Xmx${sys.env.getOrElse("SPARK_DRIVER_MEM", "48g")}",
  ),
  Compile / run / javaOptions ++= Seq(
    "-Dspark.driver.host=127.0.0.1",
    "-Dspark.ui.enabled=false",
    s"-Xmx${sys.env.getOrElse("SPARK_DRIVER_MEM", "48g")}",
  ),
  // One JVM per test run (not per suite) so a single SparkSession is reused.
  Test / parallelExecution := false,
  // Bench artifacts land in one place no matter which project runs them.
  Test / envVars += "REPRO_RESULTS_DIR" -> ((ThisBuild / baseDirectory).value / "target" / "bench-results").getAbsolutePath,
  Compile / run / envVars += "REPRO_RESULTS_DIR" -> ((ThisBuild / baseDirectory).value / "target" / "bench-results").getAbsolutePath,
)

lazy val root = (project in file("."))
  .settings(name := "repro")
  .settings(sparkRunSettings: _*)
  // spark-submit entrypoints (one per evaluation table) live in jobs/.
  .settings(Compile / unmanagedSourceDirectories += baseDirectory.value / "jobs")

// Benchmark suites (one per evaluation table) run via `sbt "bench/test"`.
lazy val bench = (project in file("bench"))
  .dependsOn(root % "compile->compile;test->test")
  .settings(name := "repro-bench")
  .settings(sparkRunSettings: _*)
