ThisBuild / scalaVersion := "2.13.17"
ThisBuild / organization := "repro"

// Spark jars come from the binary distribution baked into the image —
// the sealed container has no Maven/Ivy egress, so spark-sql etc. are
// NOT resolved coordinates but unmanaged jars on the compile classpath.
val sparkJars = file("/opt/spark/jars")

// JDK 17 module opens that the spark-submit launcher would normally add;
// forked test JVMs need them too (Kryo reflects into java.nio etc.).
val jdkModuleOptions = Seq(
  "java.base/java.lang", "java.base/java.lang.invoke", "java.base/java.lang.reflect",
  "java.base/java.io", "java.base/java.net", "java.base/java.nio",
  "java.base/java.util", "java.base/java.util.concurrent",
  "java.base/java.util.concurrent.atomic", "java.base/sun.nio.ch",
  "java.base/sun.nio.cs", "java.base/sun.security.action",
  "java.base/sun.util.calendar",
).map(p => s"--add-opens=$p=ALL-UNNAMED")

// fork: in-process Spark under sbt mis-parses core-default.xml; a forked
// JVM also keeps each test run's driver heap independent of sbt's.
val sparkTestSettings = Seq(
  Compile / unmanagedBase := sparkJars,
  Test / unmanagedBase := sparkJars,
  Test / fork := true,
  Test / javaOptions ++= jdkModuleOptions ++ Seq(
    "-Dspark.driver.host=127.0.0.1",
    "-Dspark.ui.enabled=false",
    s"-Xmx${sys.env.getOrElse("SPARK_DRIVER_MEM", "48g")}",
  ),
  // One JVM per test run (not per suite) so a single SparkSession is reused.
  Test / parallelExecution := false,
  // Test-scope deps are pre-warmed in the image's coursier cache
  // (COURSIER_MODE=offline); anything not listed here will fail to resolve.
  libraryDependencies ++= Seq(
    "org.scalatest"  %% "scalatest"   % "3.2.19" % Test,
    "org.scalacheck" %% "scalacheck"  % "1.18.0" % Test,
  ),
)

lazy val root = (project in file("."))
  .settings(sparkTestSettings)
  .settings(
    name := "repro",
    libraryDependencies += "org.duckdb" % "duckdb_jdbc" % "1.0.0",
    Compile / run / fork := true,
  )

// Benchmark suites (one per reproduced table/figure) run as ScalaTest so
// `sbt "bench/test"` regenerates every table in EXPERIMENTS.md.
lazy val bench = (project in file("bench"))
  .dependsOn(root % "compile->compile;test->test")
  .settings(sparkTestSettings)
  .settings(name := "repro-bench")

// spark-submit entrypoints, one object per table/figure; sources live
// directly under jobs/ per the repo layout contract.
lazy val jobs = (project in file("jobs"))
  .dependsOn(root)
  .settings(
    name := "repro-jobs",
    Compile / scalaSource := baseDirectory.value,
    Compile / unmanagedBase := sparkJars,
    Compile / run / fork := true,
    Compile / run / javaOptions ++= jdkModuleOptions ++ Seq(
      "-Dspark.driver.host=127.0.0.1",
      "-Dspark.ui.enabled=false",
      s"-Xmx${sys.env.getOrElse("SPARK_DRIVER_MEM", "48g")}",
    ),
  )
