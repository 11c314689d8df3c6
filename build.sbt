ThisBuild / scalaVersion := "2.13.17"
ThisBuild / organization := "repro"

// Spark jars come from the binary distribution baked into the image —
// the sealed container has no Maven/Ivy egress, so spark-sql etc. are
// NOT resolved coordinates but unmanaged jars on the compile classpath.
// Spark on JDK 17 needs the standard module opens (spark-class adds these;
// forked sbt JVMs must add them explicitly or large-partition serialization
// dies with InaccessibleObjectException on java.nio).
lazy val sparkJvmOpens = Seq(
  "java.base/java.lang", "java.base/java.lang.invoke", "java.base/java.lang.reflect",
  "java.base/java.io", "java.base/java.net", "java.base/java.nio",
  "java.base/java.util", "java.base/java.util.concurrent",
  "java.base/java.util.concurrent.atomic", "java.base/sun.nio.ch",
  "java.base/sun.nio.cs", "java.base/sun.security.action",
  "java.base/sun.util.calendar",
).map(p => s"--add-opens=$p=ALL-UNNAMED")

lazy val commonSettings = Seq(
  Compile / unmanagedBase := file("/opt/spark/jars"),
  Test / unmanagedBase := file("/opt/spark/jars"),
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
  Compile / run / javaOptions ++= sparkJvmOpens ++ Seq(
    "-Dspark.driver.host=127.0.0.1",
    "-Dspark.ui.enabled=false",
    s"-Xmx${sys.env.getOrElse("SPARK_DRIVER_MEM", "40g")}",
  ),
  Test / fork := true,
  Test / javaOptions ++= sparkJvmOpens ++ Seq(
    "-Dspark.driver.host=127.0.0.1",
    "-Dspark.ui.enabled=false",
    s"-Xmx${sys.env.getOrElse("SPARK_DRIVER_MEM", "40g")}",
  ),
  // One JVM per test run (not per suite) so a single SparkSession is reused.
  Test / parallelExecution := false,
)

lazy val root = (project in file("."))
  .settings(commonSettings, name := "repro")

// spark-submit entrypoints, one per reproduced table; sources live directly
// under jobs/ per the repo layout contract.
lazy val jobs = (project in file("jobs"))
  .dependsOn(root)
  .settings(
    commonSettings,
    name := "repro-jobs",
    Compile / scalaSource := baseDirectory.value,
  )

// Benchmark suites (sbt "bench/test"), one suite per reproduced table;
// sources live directly under bench/.
lazy val bench = (project in file("bench"))
  .dependsOn(root % "compile->compile;test->test")
  .settings(
    commonSettings,
    name := "repro-bench",
    // sbt compiles base-directory .scala files in Compile scope by default
    // (sourcesInBase); bench suites are tests, so move them to Test.
    sourcesInBase := false,
    Test / unmanagedSourceDirectories := Seq(baseDirectory.value),
  )
