ThisBuild / scalaVersion := "2.13.17"
ThisBuild / organization := "repro"

// Spark jars come from the binary distribution baked into the image —
// the sealed container has no Maven/Ivy egress, so spark-sql etc. are
// NOT resolved coordinates but unmanaged jars on the compile classpath.
lazy val sparkClasspath = Seq(
  Compile / unmanagedBase := file("/opt/spark/jars"),
  Test    / unmanagedBase := file("/opt/spark/jars"),
)

// Test-scope deps are pre-warmed in the image's coursier cache
// (COURSIER_MODE=offline); anything not listed here will fail to resolve.
lazy val testDeps = Seq(
  libraryDependencies ++= Seq(
    "org.scalatest"  %% "scalatest"   % "3.2.19" % Test,
    "org.scalacheck" %% "scalacheck"  % "1.18.0" % Test,
    "org.duckdb"     %  "duckdb_jdbc" % "1.0.0",
  )
)

// Spark's standard JDK17 module opens (spark-submit adds these itself; the
// sbt-forked test JVM must add them explicitly or Kryo/GraphX shuffles fail
// with "Unable to create serializer ... HeapByteBuffer").
lazy val jdk17Opens = Seq(
  "java.base/java.lang", "java.base/java.lang.invoke", "java.base/java.lang.reflect",
  "java.base/java.io", "java.base/java.net", "java.base/java.nio", "java.base/java.util",
  "java.base/java.util.concurrent", "java.base/java.util.concurrent.atomic",
  "java.base/jdk.internal.ref", "java.base/sun.nio.ch", "java.base/sun.nio.cs",
  "java.base/sun.security.action", "java.base/sun.util.calendar",
).map(p => s"--add-opens=$p=ALL-UNNAMED")

// fork: in-process Spark under sbt mis-parses core-default.xml; a forked
// JVM also keeps each test run's driver heap independent of sbt's.
lazy val forkSettings = Seq(
  Compile / run / fork := true,
  Test / fork := true,
  Test / javaOptions ++= Seq(
    "-Dspark.driver.host=127.0.0.1",
    "-Dspark.ui.enabled=false",
    s"-Xmx${sys.env.getOrElse("SPARK_DRIVER_MEM", "48g")}",
  ) ++ jdk17Opens,
  // One JVM per test run (not per suite) so a single SparkSession is reused.
  Test / parallelExecution := false,
)

lazy val root = (project in file("."))
  .settings(name := "repro")
  .settings(sparkClasspath ++ testDeps ++ forkSettings)
  // spark-submit entrypoints live in jobs/ but compile into the root project.
  .settings(Compile / unmanagedSourceDirectories += baseDirectory.value / "jobs")

// Benchmark suites (one per reproduced table) run as tests of this project:
//   sbt -batch "bench/test"
lazy val bench = (project in file("bench"))
  .dependsOn(root % "compile->compile;test->test")
  .settings(name := "repro-bench")
  .settings(sparkClasspath ++ testDeps ++ forkSettings)
