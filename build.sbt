ThisBuild / scalaVersion := "2.13.17"
ThisBuild / organization := "repro"

// Spark jars come from the binary distribution baked into the image —
// the sealed container has no Maven/Ivy egress, so spark-sql etc. are
// NOT resolved coordinates but unmanaged jars on the compile classpath.
ThisBuild / Compile / unmanagedBase := file("/opt/spark/jars")
ThisBuild / Test / unmanagedBase := file("/opt/spark/jars")

// Test-scope deps are pre-warmed in the image's coursier cache
// (COURSIER_MODE=offline); anything not listed here will fail to resolve.
val testDeps = Seq(
  "org.scalatest"  %% "scalatest"   % "3.2.19" % Test,
  "org.scalacheck" %% "scalacheck"  % "1.18.0" % Test,
)

val forkedJavaOptions = Seq(
  "-Dspark.driver.host=127.0.0.1",
  "-Dspark.ui.enabled=false",
  s"-Xmx${sys.env.getOrElse("SPARK_DRIVER_MEM", "48g")}",
  "-Xss64m", // deep recursive fixpoints / DFA walks in tests
  // Spark on JDK 17+ needs its launcher's --add-opens set; sbt's forked
  // JVM bypasses spark-submit, so replicate them here.
  "-Djdk.reflect.useDirectMethodHandle=false",
  "--enable-native-access=ALL-UNNAMED",
) ++ Seq(
  "java.lang", "java.lang.invoke", "java.lang.reflect", "java.io", "java.net",
  "java.nio", "java.util", "java.util.concurrent", "java.util.concurrent.atomic",
  "jdk.internal.ref", "sun.nio.ch", "sun.nio.cs", "sun.security.action",
  "sun.util.calendar",
).map(p => s"--add-opens=java.base/$p=ALL-UNNAMED")

lazy val root = (project in file("."))
  .settings(
    name := "repro",
    libraryDependencies ++= testDeps,
    libraryDependencies += "org.duckdb" % "duckdb_jdbc" % "1.0.0",
    Compile / unmanagedBase := file("/opt/spark/jars"),
    Test / unmanagedBase := file("/opt/spark/jars"),
    // spark-submit entrypoints live in jobs/ at the repo root.
    Compile / unmanagedSourceDirectories += baseDirectory.value / "jobs",
    // fork: in-process Spark under sbt mis-parses core-default.xml; a forked
    // JVM also keeps each test run's driver heap independent of sbt's.
    Compile / run / fork := true,
    Test / fork := true,
    Test / javaOptions ++= forkedJavaOptions,
    // One JVM per test run (not per suite) so a single SparkSession is reused.
    Test / parallelExecution := false,
  )

// Benchmark suites (one per paper table) live in bench/ and run with
// ``sbt -batch "bench/test"``. They reuse the root project's classes and
// the shared SparkSpec session.
lazy val bench = (project in file("bench"))
  .dependsOn(root % "compile->compile;test->test")
  .settings(
    name := "repro-bench",
    libraryDependencies ++= testDeps,
    Compile / unmanagedBase := file("/opt/spark/jars"),
    Test / unmanagedBase := file("/opt/spark/jars"),
    // Bench sources sit directly in bench/, not bench/src/test/scala —
    // and must compile in Test scope only (they extend repro.SparkSpec
    // from the root project's test classes).
    sourcesInBase := false, // keep base-dir .scala files out of Compile
    Compile / unmanagedSourceDirectories := Nil,
    Test / unmanagedSourceDirectories := Seq(baseDirectory.value),
    Test / fork := true,
    Test / javaOptions ++= forkedJavaOptions,
    Test / parallelExecution := false,
  )
