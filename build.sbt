ThisBuild / scalaVersion := "2.13.17"
ThisBuild / organization := "repro"

// Spark jars come from the binary distribution baked into the image —
// the sealed container has no Maven/Ivy egress, so spark-sql etc. are
// NOT resolved coordinates but unmanaged jars on the compile classpath.
val sparkJars = file("/opt/spark/jars")

// Spark on JDK 17 needs the module opens spark-submit normally injects;
// forked sbt JVMs don't get them automatically (SerializationDebugger and
// friends reflect into java.base).
val jpmsOpens = Seq(
  "java.base/java.lang", "java.base/java.lang.invoke", "java.base/java.lang.reflect",
  "java.base/java.io", "java.base/java.net", "java.base/java.nio",
  "java.base/java.util", "java.base/java.util.concurrent",
  "java.base/java.util.concurrent.atomic", "java.base/sun.nio.ch",
  "java.base/sun.nio.cs", "java.base/sun.security.action",
  "java.base/sun.util.calendar",
).map(p => s"--add-opens=$p=ALL-UNNAMED")

val commonSettings = Seq(
  Compile / unmanagedBase := sparkJars,
  Test    / unmanagedBase := sparkJars,
  // Test-scope deps are pre-warmed in the image's coursier cache
  // (COURSIER_MODE=offline); anything not listed here will fail to resolve.
  libraryDependencies ++= Seq(
    "org.scalatest"  %% "scalatest"   % "3.2.19" % Test,
    "org.scalacheck" %% "scalacheck"  % "1.18.0" % Test,
    "org.duckdb"     %  "duckdb_jdbc" % "1.0.0",
  ),
  // fork: in-process Spark under sbt mis-parses core-default.xml; a forked
  // JVM also keeps each test run's driver heap independent of sbt's.
  Compile / run / fork := true,
  Test / fork := true,
  Test / javaOptions ++= Seq(
    "-Dspark.driver.host=127.0.0.1",
    "-Dspark.ui.enabled=false",
    s"-Xmx${sys.env.getOrElse("SPARK_DRIVER_MEM", "48g")}",
  ) ++ jpmsOpens,
  Compile / run / javaOptions ++= jpmsOpens,
  // One JVM per test run (not per suite) so a single SparkSession is reused.
  Test / parallelExecution := false,
  // Small inputs + many small jobs: 8 shuffle partitions beat the default 64
  // by a wide margin on a single 16-core node (SparkSpec reads this env).
  Test / envVars := Map("SPARK_SHUFFLE_PARTITIONS" -> "8"),
)

lazy val root = (project in file("."))
  .settings(commonSettings)
  .settings(
    name := "repro",
    // spark-submit entrypoints live in jobs/ at the repo root, one per table.
    Compile / unmanagedSourceDirectories += baseDirectory.value / "jobs",
  )

// Benchmark suites, one per table of the paper's evaluation section.
// Run with `sbt -batch "bench/test"`; each suite prints the reproduced
// table rows and asserts the paper's qualitative shape (who wins, rough
// factors), not absolute numbers.
lazy val bench = (project in file("bench"))
  .dependsOn(root % "compile->compile;test->test")
  .settings(commonSettings)
  .settings(name := "repro-bench")
