ThisBuild / scalaVersion := "2.13.17"
ThisBuild / organization := "repro"

// Spark jars come from the binary distribution baked into the image —
// the sealed container has no Maven/Ivy egress, so spark-sql etc. are
// NOT resolved coordinates but unmanaged jars on the compile classpath.
ThisBuild / Compile / unmanagedBase := file("/opt/spark/jars")
ThisBuild / Test / unmanagedBase := file("/opt/spark/jars")

val sparkJars = file("/opt/spark/jars")

// The --add-opens set spark-submit's launcher passes on JDK 17 — without it
// Catalyst row decoding (e.g. DateType) fails in the forked JVM.
val sparkJvmOptions = Seq(
  "-Dspark.driver.host=127.0.0.1",
  "-Dspark.ui.enabled=false",
  s"-Xmx${sys.env.getOrElse("SPARK_DRIVER_MEM", "48g")}",
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
  "-Djdk.reflect.useDirectMethodHandleAccessor=false",
)

val commonTestSettings = Seq(
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
  Test / fork := true,
  Test / javaOptions ++= sparkJvmOptions,
  Compile / run / javaOptions ++= sparkJvmOptions,
  // One JVM per test run (not per suite) so a single SparkSession is reused.
  Test / parallelExecution := false,
)

// One forked bench JVM at a time — concurrent suites would share cores and
// corrupt each other's timings.
Global / concurrentRestrictions += Tags.limit(Tags.ForkedTestGroup, 1)

lazy val root = (project in file("."))
  .settings(name := "repro")
  .settings(commonTestSettings)
  .settings(
    // spark-submit entrypoints, one object per reproduced table.
    Compile / unmanagedSourceDirectories += baseDirectory.value / "jobs",
  )

// Benchmark suites (one per paper table) run with `sbt "bench/test"`.
// Each suite gets its own forked JVM — like the paper's per-experiment
// process isolation, and it keeps one table's JIT profile (megamorphic
// call-site pollution) from skewing another's timings.
lazy val bench = (project in file("bench"))
  .dependsOn(root % "compile->compile;test->test")
  .settings(name := "repro-bench")
  .settings(commonTestSettings)
  .settings(
    Test / testGrouping := {
      val opts = (Test / javaOptions).value.toVector
      (Test / definedTests).value.map { t =>
        Tests.Group(t.name, Seq(t),
          Tests.SubProcess(ForkOptions().withRunJVMOptions(opts)))
      }
    }
  )
