package repro.exp

/** Descriptive statistics used by the result tables. */
object Stats {

  def mean(xs: Seq[Double]): Double =
    if (xs.isEmpty) Double.NaN else xs.sum / xs.size

  /** Population standard deviation (descriptive, as in the paper's σ). */
  def stddev(xs: Seq[Double]): Double = {
    if (xs.isEmpty) return Double.NaN
    val m = mean(xs)
    math.sqrt(xs.map(x => (x - m) * (x - m)).sum / xs.size)
  }

  /** Quartile by linear interpolation (q in [0,1]); q=0.5 is the median. */
  def quantile(xs: Seq[Double], q: Double): Double = {
    if (xs.isEmpty) return Double.NaN
    val sorted = xs.sorted
    val pos = q * (sorted.size - 1)
    val lo = pos.toInt
    val hi = math.min(lo + 1, sorted.size - 1)
    val frac = pos - lo
    sorted(lo) * (1 - frac) + sorted(hi) * frac
  }

  /** Pearson correlation coefficient (NaN for degenerate inputs). */
  def pearson(xs: Seq[Double], ys: Seq[Double]): Double = {
    require(xs.size == ys.size, "pearson needs equal-length samples")
    if (xs.size < 2) return Double.NaN
    val mx = mean(xs); val my = mean(ys)
    var sxy = 0.0; var sxx = 0.0; var syy = 0.0
    for ((x, y) <- xs.zip(ys)) {
      sxy += (x - mx) * (y - my)
      sxx += (x - mx) * (x - mx)
      syy += (y - my) * (y - my)
    }
    if (sxx == 0 || syy == 0) Double.NaN else sxy / math.sqrt(sxx * syy)
  }

  /** Mean rank per key from per-sample rankings (1 = best), averaging
    * ranks of ties — the basis of the paper's Friedman/Nemenyi analysis.
    */
  def meanRanks(samples: Seq[Map[String, Double]]): Map[String, Double] = {
    require(samples.nonEmpty, "meanRanks needs at least one sample")
    val keys = samples.head.keySet
    val totals = scala.collection.mutable.Map[String, Double]().withDefaultValue(0.0)
    for (s <- samples) {
      require(s.keySet == keys, "inconsistent keys across samples")
      // Rank by descending value; ties share the average of their ranks.
      val sorted = s.toSeq.sortBy(-_._2)
      var i = 0
      while (i < sorted.length) {
        var j = i
        while (j + 1 < sorted.length && sorted(j + 1)._2 == sorted(i)._2) j += 1
        val avgRank = (i + j + 2) / 2.0 // ranks are 1-based: (i+1 .. j+1)
        for (k <- i to j) totals(sorted(k)._1) += avgRank
        i = j + 1
      }
    }
    keys.map(k => k -> totals(k) / samples.size).toMap
  }
}
