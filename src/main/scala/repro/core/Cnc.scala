package repro.core

/** Connected Components (CNC) — paper Algorithm 2.
  *
  * Discards all edges with weight *lower* than `t` (i.e. keeps w ≥ t),
  * computes the transitive closure of the pruned graph, and retains only
  * the components that contain exactly two entities — necessarily one
  * from each collection, since all edges cross the bipartition.
  * Time complexity O(m) via union-find.
  */
final class Cnc extends Matcher {
  override def code: String = "CNC"
  override def name: String = "Connected Components"

  override def run(g: SimGraph, t: Double): MatchResult = {
    val len = g.prefixAtLeast(t)
    val parent = Array.tabulate(g.n)(identity)
    val size = Array.fill(g.n)(1)

    def find(x: Int): Int = {
      var r = x
      while (parent(r) != r) r = parent(r)
      var c = x
      while (parent(c) != r) { val nx = parent(c); parent(c) = r; c = nx }
      r
    }

    var e = 0
    while (e < len) {
      val a = find(g.src(e)); val b = find(g.n1 + g.dst(e))
      if (a != b) {
        // Union by size keeps find near-constant.
        if (size(a) >= size(b)) { parent(b) = a; size(a) += size(b) }
        else { parent(a) = b; size(b) += size(a) }
      }
      e += 1
    }

    // A component of size 2 contains exactly one edge and therefore one
    // node per side; record the (first) edge connecting each such pair.
    val out = Array.newBuilder[(Int, Int)]
    val seen = new java.util.HashSet[Int]()
    e = 0
    while (e < len) {
      val root = find(g.src(e))
      if (size(root) == 2 && seen.add(root)) out += ((g.src(e), g.dst(e)))
      e += 1
    }
    MatchResult(out.result())
  }
}
