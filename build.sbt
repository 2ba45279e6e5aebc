ThisBuild / scalaVersion := "2.13.17"
ThisBuild / organization := "repro"

// Spark jars come from the binary distribution baked into the image —
// the sealed container has no Maven/Ivy egress, so spark-sql etc. are
// NOT resolved coordinates but unmanaged jars on the compile classpath.
val sparkJars = file("/opt/spark/jars")

// Java 17 module opens required by Spark 4.x when forked outside spark-submit.
val sparkJavaOptions = Seq(
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
  "-Dspark.driver.host=127.0.0.1",
  "-Dspark.ui.enabled=false",
)

val sharedSettings = Seq(
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
  Compile / run / javaOptions ++= sparkJavaOptions :+
    s"-Xmx${sys.env.getOrElse("SPARK_DRIVER_MEM", "48g")}",
  Test / fork := true,
  Test / javaOptions ++= sparkJavaOptions :+
    s"-Xmx${sys.env.getOrElse("SPARK_DRIVER_MEM", "48g")}",
  // One JVM per test run (not per suite) so a single SparkSession is reused.
  Test / parallelExecution := false,
)

lazy val root: Project = (project in file("."))
  .settings(name := "repro")
  .settings(sharedSettings)

// spark-submit entrypoints, one object per reproduced table.
lazy val jobs: Project = (project in file("jobs"))
  .dependsOn(root)
  .settings(name := "repro-jobs")
  .settings(sharedSettings)

// Benchmark suites, one per evaluation table; run with `sbt "bench/test"`.
// Deliberately NOT aggregated by root so `sbt test` stays fast; depends on
// jobs so the standard compile/test/bench chain builds every module.
lazy val bench: Project = (project in file("bench"))
  .dependsOn(root % "compile->compile;test->test", jobs)
  .settings(name := "repro-bench")
  .settings(sharedSettings)
  .settings(
    // One forked JVM per bench suite: the tables report wall-clock numbers,
    // and a long scan in one suite must not pollute JIT/GC state of the next.
    Test / testGrouping := {
      val opts = (Test / javaOptions).value.toVector
      (Test / definedTests).value.map { t =>
        Tests.Group(t.name, Seq(t),
          Tests.SubProcess(ForkOptions().withRunJVMOptions(opts)))
      }
    },
  )
