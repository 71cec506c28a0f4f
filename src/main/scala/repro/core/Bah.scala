package repro.core

/** Best Assignment Heuristic (BAH) — paper Algorithm 4.
  *
  * Swap-based random search for the maximum-weight bipartite matching.
  * Each entity of the smaller collection starts connected to an entity of
  * the larger one; a *search step* sweeps one random swap attempt per
  * entity of the larger collection (the only reading consistent with the
  * paper's reported run-times: ~2 s for small datasets and the 2-minute
  * timeout binding on the largest ones at 10,000 steps). A swap of two
  * partners is accepted when the summed pair contribution does not
  * decrease (D ≥ 0). Pair contributions d(i,j) are the edge weights
  * above `t`, 0 otherwise.
  *
  * For this reproduction the total number of swap attempts is capped at
  * `maxAttempts` (default 300k) instead of the paper's 2-minute
  * wall-clock budget — the per-graph scale here is ~100× smaller, and
  * the cap preserves BAH's profile: stochastic, orders of magnitude
  * slower than the other algorithms, capable of good assignments on
  * balanced collections and poor ones elsewhere.
  *
  * The RNG seed derives from the graph shape and threshold, so identical
  * inputs give identical outputs while different thresholds explore
  * different walks (the paper reports BAH's variance through σ).
  */
final class Bah(
    val maxSteps: Int = 10000,
    val maxAttempts: Long = 1000000L,
    val timeoutMillis: Long = 120000L,
) extends Matcher {
  override def code: String = "BAH"
  override def name: String = "Best Assignment Heuristic"
  override def extraConfig: String =
    s"maximum search steps ($maxSteps); attempt cap ($maxAttempts); " +
      s"maximum run-time (${timeoutMillis / 1000} s)"

  override def run(g: SimGraph, t: Double): MatchResult = prepare(g)(t)

  override def prepare(g: SimGraph): Double => MatchResult = {
    val v1Larger = g.n1 >= g.n2
    val nL = math.max(g.n1, g.n2) // larger collection (swapped over)
    val nS = math.min(g.n1, g.n2) // smaller collection (each gets a partner)

    // All positive edges once, keyed by larger-side id; the threshold is
    // applied at lookup time so a sweep shares this map.
    val d = new java.util.HashMap[Long, Double](g.m * 2)
    var e = 0
    while (e < g.m) {
      val l = if (v1Larger) g.src(e) else g.dst(e)
      val s = if (v1Larger) g.dst(e) else g.src(e)
      d.put(l.toLong * nS + s, g.w(e))
      e += 1
    }

    (t: Double) => {
      if (nS == 0) MatchResult(Array.empty)
      else {
        @inline def contrib(l: Int, s: Int): Double =
          if (s < 0) 0.0
          else {
            val w = d.getOrDefault(l.toLong * nS + s, 0.0)
            if (w > t) w else 0.0
          }

        // Initial assignment: i-th of the larger with i-th of the smaller.
        val p = Array.tabulate(nL)(i => if (i < nS) i else -1)

        val seed = (g.m.toLong * 1000003L) ^ java.lang.Double.doubleToLongBits(t) ^ (nL.toLong << 17)
        val rnd = new java.util.Random(seed)
        val deadline = System.nanoTime() + timeoutMillis * 1000000L
        val attemptBudget = math.min(maxSteps.toLong * nL, maxAttempts)

        var attempts = 0L
        var timedOut = false
        while (attempts < attemptBudget && !timedOut) {
          attempts += 1
          val i = rnd.nextInt(nL)
          var j = rnd.nextInt(nL)
          while (j == i) j = rnd.nextInt(nL)
          val gain = contrib(i, p(j)) + contrib(j, p(i)) - contrib(i, p(i)) - contrib(j, p(j))
          if (gain >= 0) { val tmp = p(i); p(i) = p(j); p(j) = tmp }
          if ((attempts & 0x3fff) == 0 && System.nanoTime() > deadline) timedOut = true
        }

        // Only pairs with an above-threshold edge form 2-clusters; the
        // rest of the random pairing is noise the final filter removes.
        val out = Array.newBuilder[(Int, Int)]
        var l = 0
        while (l < nL) {
          val s = p(l)
          if (s >= 0 && contrib(l, s) > 0.0)
            out += (if (v1Larger) (l, s) else (s, l))
          l += 1
        }
        MatchResult(out.result())
      }
    }
  }
}
