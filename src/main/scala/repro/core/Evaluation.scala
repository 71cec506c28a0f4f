package repro.core

/** Effectiveness measures of the paper (§5):
  *
  *  - Precision: portion of output 2-clusters that are true matches.
  *  - Recall: portion of ground-truth matches present in the output.
  *  - F-Measure: harmonic mean of the two.
  */
final case class PRF(precision: Double, recall: Double) {
  def f1: Double =
    if (precision + recall == 0) 0.0
    else 2 * precision * recall / (precision + recall)
}

object Evaluation {

  /** Ground truth: set of duplicate pairs (V1 id, V2 id) packed as longs
    * for cheap membership tests.
    */
  final class GroundTruth(pairs: Iterable[(Int, Int)]) {
    private val set = {
      val s = new java.util.HashSet[Long](pairs.size * 2)
      pairs.foreach { case (i, j) => s.add(pack(i, j)) }
      s
    }
    val size: Int = set.size
    def contains(i: Int, j: Int): Boolean = set.contains(pack(i, j))
    private def pack(i: Int, j: Int): Long = (i.toLong << 32) | (j.toLong & 0xffffffffL)
  }

  /** Evaluate a matching against the ground truth. An empty output has
    * precision 0 by convention (no correct clusters were emitted).
    */
  def evaluate(result: MatchResult, gt: GroundTruth): PRF = {
    if (gt.size == 0) return PRF(0.0, 0.0)
    var tp = 0
    var i = 0
    val ps = result.pairs
    while (i < ps.length) {
      if (gt.contains(ps(i)._1, ps(i)._2)) tp += 1
      i += 1
    }
    PRF(
      precision = if (ps.length == 0) 0.0 else tp.toDouble / ps.length,
      recall = tp.toDouble / gt.size,
    )
  }
}
