package repro.bench

import java.nio.file.{Files, Path, Paths}

/** Resolves the repo-root-anchored results directory regardless of the
  * forked test JVM's working directory (sbt runs bench tests from the
  * subproject base).
  */
object BenchPaths {
  def resultsDir: Path = {
    var p = Paths.get("").toAbsolutePath
    while (p != null && !Files.exists(p.resolve("build.sbt"))) p = p.getParent
    val root = if (p == null) Paths.get("").toAbsolutePath else p
    val dir  = root.resolve("bench").resolve("results")
    Files.createDirectories(dir)
    dir
  }
}
