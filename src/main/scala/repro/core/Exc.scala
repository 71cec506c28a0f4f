package repro.core

/** Exact Clustering (EXC) — paper Algorithm 6.
  *
  * Places two entities in the same cluster only if they are *mutually*
  * the best matches of each other among edges with weight > t — a
  * stricter, symmetric version of BMC (reciprocity check). Ties are
  * resolved by the canonical (weight desc, src asc, dst asc) edge order,
  * matching the priority-queue pop of the pseudocode.
  */
final class Exc extends Matcher {
  override def code: String = "EXC"
  override def name: String = "Exact Clustering"

  override def run(g: SimGraph, t: Double): MatchResult = {
    val len = g.prefixAbove(t)
    // bestOf(node) = index of the top edge per node; edges are scanned in
    // canonical order so the first edge seen per node is its best.
    val best = Array.fill(g.n)(-1)
    var e = 0
    while (e < len) {
      val a = g.src(e); val b = g.n1 + g.dst(e)
      if (best(a) < 0) best(a) = e
      if (best(b) < 0) best(b) = e
      e += 1
    }
    val out = Array.newBuilder[(Int, Int)]
    var i = 0
    while (i < g.n1) {
      val be = best(i)
      if (be >= 0 && best(g.n1 + g.dst(be)) == be) out += ((i, g.dst(be)))
      i += 1
    }
    MatchResult(out.result())
  }
}
