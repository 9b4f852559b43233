ThisBuild / scalaVersion := "2.13.17"
ThisBuild / organization := "repro"

// Spark jars come from the binary distribution baked into the image —
// the sealed container has no Maven/Ivy egress, so spark-sql etc. are
// NOT resolved coordinates but unmanaged jars on the compile classpath.
Compile / unmanagedBase := file("/opt/spark/jars")
Test    / unmanagedBase := file("/opt/spark/jars")

// Test-scope deps are pre-warmed in the image's coursier cache
// (COURSIER_MODE=offline); anything not listed here will fail to resolve.
libraryDependencies ++= Seq(
  "org.scalatest"  %% "scalatest"   % "3.2.19" % Test,
  "org.scalacheck" %% "scalacheck"  % "1.18.0" % Test,
  "org.duckdb"     %  "duckdb_jdbc" % "1.0.0",
)

// fork: in-process Spark under sbt mis-parses core-default.xml; a forked
// JVM also keeps each test run's driver heap independent of sbt's.
Compile / run / fork := true
Test / fork := true

// The skyline integration is installed the same way a Spark deployment
// would: via the spark.sql.extensions static conf, picked up from system
// properties when the shared SparkSession is first built.
// JDK 17 module opens that the spark-submit launcher normally injects
// (org.apache.spark.launcher.JavaModuleOptions); the forked test JVM needs
// them too, e.g. for java.sql.Date encoding (sun.util.calendar access).
val sparkModuleOpens = Seq(
  "java.base/java.lang", "java.base/java.lang.invoke", "java.base/java.lang.reflect",
  "java.base/java.io", "java.base/java.net", "java.base/java.nio",
  "java.base/java.util", "java.base/java.util.concurrent",
  "java.base/java.util.concurrent.atomic", "java.base/jdk.internal.ref",
  "java.base/sun.nio.ch", "java.base/sun.nio.cs", "java.base/sun.security.action",
  "java.base/sun.util.calendar", "java.security.jgss/sun.security.krb5",
).map(p => s"--add-opens=$p=ALL-UNNAMED")

val sparkTestOpts = sparkModuleOpens ++ Seq(
  "-XX:+IgnoreUnrecognizedVMOptions",
  "-Dspark.driver.host=127.0.0.1",
  "-Dspark.ui.enabled=false",
  "-Dspark.sql.extensions=repro.core.SkylineExtensions",
  s"-Xmx${sys.env.getOrElse("SPARK_DRIVER_MEM", "48g")}",
)
Test / javaOptions ++= sparkTestOpts
// One JVM per test run (not per suite) so a single SparkSession is reused.
Test / parallelExecution := false

lazy val root = (project in file("."))
  .settings(
    name := "repro",
    // spark-submit entrypoints (one object per reproduced table) compile
    // with the main sources so `sbt package` ships them too.
    Compile / unmanagedSourceDirectories += baseDirectory.value / "jobs",
  )

// Benchmark suites (one per paper table) live in their own project so
// `sbt "bench/test"` reproduces the evaluation without running unit tests.
lazy val bench = (project in file("bench"))
  .dependsOn(root % "compile->compile;test->test")
  .settings(
    name := "repro-bench",
    Compile / unmanagedBase := file("/opt/spark/jars"),
    Test / unmanagedBase := file("/opt/spark/jars"),
    libraryDependencies ++= Seq(
      "org.scalatest" %% "scalatest" % "3.2.19" % Test,
    ),
    Test / fork := true,
    Test / javaOptions ++= sparkTestOpts,
    Test / parallelExecution := false,
  )
