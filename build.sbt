ThisBuild / scalaVersion := "2.13.17"
ThisBuild / organization := "repro"

// Spark jars come from the binary distribution baked into the image —
// the sealed container has no Maven/Ivy egress, so spark-sql etc. are
// NOT resolved coordinates but unmanaged jars on the compile classpath.
val sparkJars = file("/opt/spark/jars")

// Test-scope deps are pre-warmed in the image's coursier cache
// (COURSIER_MODE=offline); anything not listed here will fail to resolve.
val testDeps = Seq(
  "org.scalatest"  %% "scalatest"   % "3.2.19" % Test,
  "org.scalacheck" %% "scalacheck"  % "1.18.0" % Test,
  "org.duckdb"     %  "duckdb_jdbc" % "1.0.0",
)

// Spark on JDK 17 needs the module system opened up (same flags the
// spark-submit launcher injects).
val sparkJavaOpens = Seq(
  "java.lang", "java.lang.invoke", "java.lang.reflect", "java.io", "java.net",
  "java.nio", "java.util", "java.util.concurrent", "java.util.concurrent.atomic",
  "jdk.internal.ref", "sun.nio.ch", "sun.nio.cs", "sun.security.action",
  "sun.util.calendar",
).map(p => s"--add-opens=java.base/$p=ALL-UNNAMED") ++ Seq(
  "-Djdk.reflect.useDirectMethodHandle=false",
  "-Dio.netty.tryReflectionSetAccessible=true",
)

// fork: in-process Spark under sbt mis-parses core-default.xml; a forked
// JVM also keeps each test run's driver heap independent of sbt's.
val commonSettings = Seq(
  Compile / unmanagedBase := sparkJars,
  Test    / unmanagedBase := sparkJars,
  libraryDependencies ++= testDeps,
  Compile / run / fork := true,
  Compile / run / javaOptions ++= sparkJavaOpens ++ Seq(
    "-Dspark.driver.host=127.0.0.1",
    "-Dspark.ui.enabled=false",
    s"-Xmx${sys.env.getOrElse("SPARK_DRIVER_MEM", "48g")}",
  ),
  Test / fork := true,
  Test / javaOptions ++= sparkJavaOpens ++ Seq(
    "-Dspark.driver.host=127.0.0.1",
    "-Dspark.ui.enabled=false",
    s"-Xmx${sys.env.getOrElse("SPARK_DRIVER_MEM", "48g")}",
  ),
  // One JVM per test run (not per suite) so a single SparkSession is reused.
  Test / parallelExecution := false,
)

lazy val root = (project in file("."))
  .settings(commonSettings)
  .settings(
    name := "repro",
    // spark-submit entrypoints (one per table/figure) live in jobs/.
    Compile / unmanagedSourceDirectories += baseDirectory.value / "jobs",
  )

// Benchmark harnesses (one suite per paper table/figure); run via
// `sbt -batch "bench/test"`. Reuses root's SparkSpec through test->test.
lazy val bench = (project in file("bench"))
  .dependsOn(root % "compile->compile;test->test")
  .settings(commonSettings)
  .settings(name := "bench")
