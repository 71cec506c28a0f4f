package repro.core

/** Per-(graph, algorithm) threshold optimisation, as in the paper (§5):
  * the similarity threshold is varied from 0.05 to 1.0 with step 0.05 and
  * the *largest* threshold achieving the highest F-Measure is selected.
  */
object ThresholdSweep {

  /** The paper's threshold grid {0.05, 0.10, …, 1.00}. */
  val grid: Array[Double] = Array.tabulate(20)(k => (k + 1) * 0.05)

  /** Outcome of a sweep at the selected optimal threshold. */
  final case class Outcome(
      matcher: String,
      bestT: Double,
      prf: PRF,
      runtimeMs: Double,
      bmcBasisV1: Boolean = true,
  ) {
    def f1: Double = prf.f1
  }

  /** Sweep one matcher over one (already min-max-normalized) graph.
    *
    * @param timedReps how many timed repetitions to run at the optimal
    *                  threshold (paper: 10); 0 skips timing.
    */
  def sweep(
      matcher: Matcher,
      g: SimGraph,
      gt: Evaluation.GroundTruth,
      timedReps: Int = 10,
  ): Outcome = {
    val run = matcher.prepare(g)
    var bestT = grid(0)
    var best = PRF(0.0, 0.0)
    var k = 0
    while (k < grid.length) {
      val t = grid(k)
      val prf = Evaluation.evaluate(run(t), gt)
      // Largest t achieving the highest F1 (>= keeps later, larger t).
      if (prf.f1 >= best.f1) { best = prf; bestT = t }
      k += 1
    }
    val ms =
      if (timedReps <= 0) 0.0
      else {
        // Paper's run-time: from receiving the weighted graph to returning
        // the partitions — i.e. one full matcher invocation (not prepare-
        // amortized), averaged over `timedReps` executions.
        var total = 0L
        var r = 0
        while (r < timedReps) {
          val t0 = System.nanoTime()
          matcher.run(g, bestT)
          total += System.nanoTime() - t0
          r += 1
        }
        total / 1e6 / timedReps
      }
    Outcome(matcher.code, bestT, best, ms)
  }

  /** Sweep BMC over both basis collections and keep the better one
    * (paper: "we examine both options and retain the best one").
    */
  def sweepBmc(
      g: SimGraph,
      gt: Evaluation.GroundTruth,
      timedReps: Int = 10,
  ): Outcome = {
    val a = sweep(new Bmc(basisV1 = true), g, gt, timedReps)
    val b = sweep(new Bmc(basisV1 = false), g, gt, timedReps)
    val better = if (a.f1 >= b.f1) a.copy(bmcBasisV1 = true) else b.copy(bmcBasisV1 = false)
    better.copy(matcher = "BMC")
  }

  /** Sweep all eight algorithms over a graph; BMC picks its best basis. */
  def sweepAll(
      g: SimGraph,
      gt: Evaluation.GroundTruth,
      timedReps: Int = 10,
  ): Map[String, Outcome] = {
    val base = Matchers.all.filterNot(_.code == "BMC").map { m =>
      m.code -> sweep(m, g, gt, timedReps)
    }
    (base :+ ("BMC" -> sweepBmc(g, gt, timedReps))).toMap
  }
}
