package repro.exp

import org.apache.spark.sql.SparkSession

/** One full experiment per JVM, shared by all bench suites / jobs.
  *
  * The scale knob `REPRO_SCALE` multiplies every dataset's collection
  * sizes (1.0 = the DESIGN.md defaults, ≤ ~0.8M pairs per dataset).
  */
object ExperimentStore {

  /** Linear dataset scale from the environment (default 1.0). */
  lazy val scale: Double = sys.env.get("REPRO_SCALE").map(_.toDouble).getOrElse(1.0)

  @volatile private var cached: ExperimentResults = _

  /** Run (once) and return the full experiment at `scale`. */
  def results(spark: SparkSession): ExperimentResults = synchronized {
    if (cached == null) {
      val t0 = System.nanoTime()
      Console.err.println(s"[ExperimentStore] running full experiment at scale=$scale …")
      cached = Runner.runAll(spark, RunConfig(scale = scale))
      Console.err.println(
        f"[ExperimentStore] done: ${cached.graphs.size} graphs in ${(System.nanoTime() - t0) / 1e9}%.0f s")
    }
    cached
  }
}
