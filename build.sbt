ThisBuild / scalaVersion := "2.13.17"
ThisBuild / organization := "repro"

// Spark jars come from the binary distribution baked into the image —
// the sealed container has no Maven/Ivy egress, so spark-sql etc. are
// NOT resolved coordinates but unmanaged jars on the compile classpath.
val sparkJars = file("/opt/spark/jars")

// Spark's standard JVM module options (launcher/JavaModuleOptions): Java 17
// encapsulates sun.util.calendar etc., which Catalyst's date/time decoding
// reflects into; without these, collecting a DateType column throws.
val sparkModuleOptions = Seq(
  "-XX:+IgnoreUnrecognizedVMOptions",
  "--add-opens=java.base/java.lang=ALL-UNNAMED",
  "--add-opens=java.base/java.lang.invoke=ALL-UNNAMED",
  "--add-opens=java.base/java.lang.reflect=ALL-UNNAMED",
  "--add-opens=java.base/java.io=ALL-UNNAMED",
  "--add-opens=java.base/java.net=ALL-UNNAMED",
  "--add-opens=java.base/java.nio=ALL-UNNAMED",
  "--add-opens=java.base/java.util=ALL-UNNAMED",
  "--add-opens=java.base/java.util.concurrent=ALL-UNNAMED",
  "--add-opens=java.base/java.util.concurrent.atomic=ALL-UNNAMED",
  "--add-opens=java.base/jdk.internal.ref=ALL-UNNAMED",
  "--add-opens=java.base/sun.nio.ch=ALL-UNNAMED",
  "--add-opens=java.base/sun.nio.cs=ALL-UNNAMED",
  "--add-opens=java.base/sun.security.action=ALL-UNNAMED",
  "--add-opens=java.base/sun.util.calendar=ALL-UNNAMED",
  "--add-opens=java.security.jgss/sun.security.krb5=ALL-UNNAMED",
  "-Djdk.reflect.useDirectMethodHandle=false",
)

// Shared settings for every project: offline deps, forked test JVMs with a
// fixed driver heap, serial suites so the single SparkSession is reused.
lazy val sharedSettings = Seq(
  Compile / unmanagedBase := sparkJars,
  Test / unmanagedBase := sparkJars,
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
  Compile / run / javaOptions ++= sparkModuleOptions,
  Test / fork := true,
  Test / javaOptions ++= Seq(
    "-Dspark.driver.host=127.0.0.1",
    "-Dspark.ui.enabled=false",
    s"-Xmx${sys.env.getOrElse("SPARK_DRIVER_MEM", "48g")}",
  ) ++ sparkModuleOptions,
  // One JVM per test run (not per suite) so a single SparkSession is reused.
  Test / parallelExecution := false,
)

lazy val root = (project in file("."))
  .settings(sharedSettings)
  .settings(
    name := "repro",
    // spark-submit entrypoints live in jobs/ (one object per table/figure).
    Compile / unmanagedSourceDirectories += baseDirectory.value / "jobs",
  )

// Benchmark suites (one per paper table) run via `sbt "bench/test"`.
// They reuse the root test classpath (SparkSpec, Oracle) via test->test.
lazy val bench = (project in file("bench"))
  .settings(sharedSettings)
  .settings(name := "repro-bench")
  .dependsOn(root % "compile->compile;test->test")
