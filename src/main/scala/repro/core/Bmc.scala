package repro.core

/** Best Match Clustering (BMC) — paper Algorithm 5.
  *
  * For each entity of the basis collection (in id order), creates a new
  * cluster and adds the most similar not-yet-clustered entity of the
  * other collection, provided the edge weight exceeds `t`. The basis
  * collection (V1 or V2) is an extra configuration parameter; the paper
  * evaluates both and keeps the better one, which `ThresholdSweep` does
  * by sweeping both variants. O(m).
  */
final class Bmc(val basisV1: Boolean = true) extends Matcher {
  override def code: String = if (basisV1) "BMC" else "BMC2"
  override def name: String = "Best Match Clustering"
  override def extraConfig: String = "node partition used as basis"

  override def run(g: SimGraph, t: Double): MatchResult = {
    val len = g.prefixAbove(t)
    val adj = g.adjacency(len)
    val out = Array.newBuilder[(Int, Int)]
    if (basisV1) {
      val matched2 = new Array[Boolean](g.n2)
      var i = 0
      while (i < g.n1) {
        // Adjacency is in decreasing-weight order: the first unmatched
        // neighbour is the best available match.
        val es = adj(i)
        var k = 0; var done = false
        while (k < es.length && !done) {
          val j = g.dst(es(k))
          if (!matched2(j)) { matched2(j) = true; out += ((i, j)); done = true }
          k += 1
        }
        i += 1
      }
    } else {
      val matched1 = new Array[Boolean](g.n1)
      var j = 0
      while (j < g.n2) {
        val es = adj(g.n1 + j)
        var k = 0; var done = false
        while (k < es.length && !done) {
          val i = g.src(es(k))
          if (!matched1(i)) { matched1(i) = true; out += ((i, j)); done = true }
          k += 1
        }
        j += 1
      }
    }
    MatchResult(out.result())
  }
}
