ThisBuild / scalaVersion := "2.13.17"
ThisBuild / organization := "repro"

// Spark jars come from the binary distribution baked into the image —
// the sealed container has no Maven/Ivy egress, so spark-sql etc. are
// NOT resolved coordinates but unmanaged jars on the compile classpath.
val sparkJars = Seq(
  Compile / unmanagedBase := file("/opt/spark/jars"),
  Test    / unmanagedBase := file("/opt/spark/jars"),
)

// Test-scope deps are pre-warmed in the image's coursier cache
// (COURSIER_MODE=offline); anything not listed here will fail to resolve.
val testDeps = Seq(
  "org.scalatest"  %% "scalatest"   % "3.2.19" % Test,
  "org.scalacheck" %% "scalacheck"  % "1.18.0" % Test,
)

// The JDK17 module opens spark-submit normally injects (JavaModuleOptions);
// forked test JVMs need them too (Kryo reflects into java.nio et al.).
val sparkModuleOpens = Seq(
  "java.base/java.lang", "java.base/java.lang.invoke", "java.base/java.lang.reflect",
  "java.base/java.io", "java.base/java.net", "java.base/java.nio",
  "java.base/java.util", "java.base/java.util.concurrent",
  "java.base/java.util.concurrent.atomic", "java.base/jdk.internal.ref",
  "java.base/sun.nio.ch", "java.base/sun.nio.cs", "java.base/sun.security.action",
  "java.base/sun.util.calendar",
).map(m => s"--add-opens=$m=ALL-UNNAMED") :+ "-Djdk.reflect.useDirectMethodHandleAccessor=false"

val sparkTestSettings = Seq(
  Compile / run / fork := true,
  Compile / run / javaOptions ++= sparkModuleOpens ++ Seq(
    "-Dspark.driver.host=127.0.0.1",
    "-Dspark.ui.enabled=false",
    s"-Xmx${sys.env.getOrElse("SPARK_DRIVER_MEM", "48g")}",
  ),
  Test / fork := true,
  Test / javaOptions ++= sparkModuleOpens,
  Test / javaOptions ++= Seq(
    "-Dspark.driver.host=127.0.0.1",
    "-Dspark.ui.enabled=false",
    s"-Xmx${sys.env.getOrElse("SPARK_DRIVER_MEM", "48g")}",
  ),
  // One JVM per test run (not per suite) so a single SparkSession is reused.
  Test / parallelExecution := false,
)

lazy val root = (project in file("."))
  .settings(
    name := "repro",
    libraryDependencies ++= testDeps :+ ("org.duckdb" % "duckdb_jdbc" % "1.0.0"),
    // spark-submit entrypoints live in jobs/ at the repo root.
    Compile / unmanagedSourceDirectories += baseDirectory.value / "jobs",
  )
  .settings(sparkJars)
  .settings(sparkTestSettings)

// Benchmark harnesses live in bench/src/test and are run with `sbt "bench/test"`.
// They reuse the root project's main classes and the SparkSpec test trait.
lazy val bench = (project in file("bench"))
  .dependsOn(root % "compile->compile;test->test")
  .settings(
    name := "repro-bench",
    libraryDependencies ++= testDeps,
  )
  .settings(sparkJars)
  .settings(sparkTestSettings)
