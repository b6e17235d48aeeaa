ThisBuild / scalaVersion := "2.13.17"
ThisBuild / organization := "repro"

// Spark jars come from the binary distribution baked into the image —
// the sealed container has no Maven/Ivy egress, so spark-sql etc. are
// NOT resolved coordinates but unmanaged jars on the compile classpath.
ThisBuild / libraryDependencies ++= Seq(
  "org.scalatest"  %% "scalatest"   % "3.2.19" % Test,
  "org.scalacheck" %% "scalacheck"  % "1.18.0" % Test,
  "org.duckdb"     %  "duckdb_jdbc" % "1.0.0",
)

// JDK 17 module opens that the spark-submit launcher would normally add;
// the forked test JVM needs them too (Kryo serialises java.nio buffers
// during GraphX shuffles).
lazy val sparkJavaOpens = Seq(
  "java.base/java.lang", "java.base/java.lang.invoke", "java.base/java.lang.reflect",
  "java.base/java.io", "java.base/java.net", "java.base/java.nio",
  "java.base/java.util", "java.base/java.util.concurrent",
  "java.base/java.util.concurrent.atomic", "java.base/jdk.internal.ref",
  "java.base/sun.nio.ch", "java.base/sun.nio.cs", "java.base/sun.security.action",
  "java.base/sun.util.calendar",
).map(p => s"--add-opens=$p=ALL-UNNAMED")

lazy val sparkSettings = Seq(
  Compile / unmanagedBase := file("/opt/spark/jars"),
  Test    / unmanagedBase := file("/opt/spark/jars"),
  Compile / run / fork := true,
  Compile / run / javaOptions ++= sparkJavaOpens,
  Test / fork := true,
  Test / javaOptions ++= sparkJavaOpens,
  Test / javaOptions ++= Seq(
    "-Dspark.driver.host=127.0.0.1",
    "-Dspark.ui.enabled=false",
    // AQE re-plans every tiny shuffle; at test scale that is pure overhead
    // for the iterative algorithms (hundreds of micro-jobs per suite).
    "-Dspark.sql.adaptive.enabled=false",
    s"-Xmx${sys.env.getOrElse("SPARK_DRIVER_MEM", "48g")}",
  ),
  // One JVM per test run (not per suite) so a single SparkSession is reused.
  Test / parallelExecution := false,
  // Small graphs + iterative algorithms: 64 shuffle partitions would spend
  // the whole run on task-scheduling overhead. Shuffles are still exercised.
  Test / envVars += "SPARK_SHUFFLE_PARTITIONS" ->
    sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "8"),
)

lazy val root = (project in file("."))
  .settings(sparkSettings)
  .settings(
    name := "repro",
    // spark-submit entrypoints live in jobs/, one object per paper table.
    Compile / unmanagedSourceDirectories += baseDirectory.value / "jobs",
  )

// Benchmark harnesses: one suite per evaluation table, run via `bench/test`.
// They share the root project's main sources and the SparkSpec test trait.
lazy val bench = (project in file("bench"))
  .dependsOn(root % "compile->compile;test->test")
  .settings(sparkSettings)
  .settings(name := "repro-bench")
