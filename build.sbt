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
val addOpens = Seq(
  "java.lang", "java.lang.invoke", "java.lang.reflect", "java.io", "java.net",
  "java.nio", "java.util", "java.util.concurrent", "java.util.concurrent.atomic",
  "sun.nio.ch", "sun.nio.cs", "sun.security.action", "sun.util.calendar",
).map(p => s"--add-opens=java.base/$p=ALL-UNNAMED")

val forkSettings = Seq(
  Compile / run / fork := true,
  Compile / run / javaOptions ++= addOpens ++ Seq(
    "-Dspark.driver.host=127.0.0.1",
    "-Dspark.ui.enabled=false",
    s"-Xmx${sys.env.getOrElse("SPARK_DRIVER_MEM", "48g")}",
  ),
  Test / fork := true,
  // JDK 17 module opens that spark-submit normally injects (JavaModuleOptions);
  // without them Kryo/Unsafe paths fail under a plain forked JVM.
  Test / javaOptions ++= addOpens ++ Seq(
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
  // spark-submit entrypoints live in jobs/ at the repo root, one main per table.
  .settings(Compile / unmanagedSourceDirectories += baseDirectory.value / "jobs")

// Benchmark harness: one suite per paper table, run via `sbt "bench/test"`.
// Depends on root's test classes so suites can extend repro.SparkSpec.
lazy val bench = (project in file("bench"))
  .dependsOn(root % "compile->compile;test->test")
  .settings(name := "repro-bench")
  .settings(sparkJars ++ testDeps ++ forkSettings)
