package repro.bench

import java.nio.file.{Files, Paths, StandardOpenOption}
import repro.SparkSpec
import repro.exp.{ExperimentResults, ExperimentStore}

/** Base for the per-table bench suites: shares the one full experiment
  * of the JVM (ExperimentStore) and writes each reproduced table to
  * `bench/results/`.
  */
trait BenchBase extends SparkSpec {

  /** The full experiment (runs once per JVM, at REPRO_SCALE). */
  lazy val results: ExperimentResults = ExperimentStore.results(spark)

  /** Persist a table's markdown and echo it to the test log. */
  def emit(name: String, markdown: String): Unit = {
    // The forked test JVM's cwd is the bench subproject dir; resolve the
    // default output dir against the repo root.
    val cwd = Paths.get(sys.props("user.dir"))
    val root = if (cwd.getFileName != null && cwd.getFileName.toString == "bench") cwd.getParent else cwd
    val dir = sys.env.get("REPRO_RESULTS_DIR").map(Paths.get(_))
      .getOrElse(root.resolve("bench").resolve("results"))
    Files.createDirectories(dir)
    Files.write(dir.resolve(s"$name.md"), markdown.getBytes("UTF-8"),
      StandardOpenOption.CREATE, StandardOpenOption.TRUNCATE_EXISTING)
    info("\n" + markdown)
  }
}
