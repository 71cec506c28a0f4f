package repro.core

/** Unique Mapping Clustering (UMC) — paper Algorithm 8.
  *
  * Keeps edges with weight > t, iterates them in decreasing weight order,
  * and forms a 2-cluster for the current edge whenever neither endpoint
  * has already been matched (the unique mapping constraint of CCER).
  * Equivalent to CLIP clustering restricted to two sources.
  * O(m log m) in general; O(prefix) here because edges are pre-sorted.
  */
final class Umc extends Matcher {
  override def code: String = "UMC"
  override def name: String = "Unique Mapping Clustering"

  override def run(g: SimGraph, t: Double): MatchResult = {
    val len = g.prefixAbove(t)
    val matched1 = new Array[Boolean](g.n1)
    val matched2 = new Array[Boolean](g.n2)
    val out = Array.newBuilder[(Int, Int)]
    var e = 0
    while (e < len) {
      val i = g.src(e); val j = g.dst(e)
      if (!matched1(i) && !matched2(j)) {
        matched1(i) = true; matched2(j) = true
        out += ((i, j))
      }
      e += 1
    }
    MatchResult(out.result())
  }
}
