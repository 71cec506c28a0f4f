package repro.core

/** An in-memory bipartite similarity graph `G = (V1, V2, E)`.
  *
  * Nodes of the two collections use separate, dense id spaces:
  * `src` in `[0, n1)` indexes V1 and `dst` in `[0, n2)` indexes V2.
  * Edges are stored as parallel arrays sorted by (weight desc, src asc,
  * dst asc) — the canonical total order used by every matcher for
  * deterministic tie-breaking. Because the order is weight-descending,
  * the surviving edges for any threshold `t` form a *prefix* of the
  * arrays, which makes 20-point threshold sweeps O(Σ prefix) instead of
  * 20 × O(m log m).
  *
  * @param n1  number of entities in V1
  * @param n2  number of entities in V2
  * @param src V1 endpoint per edge (sorted order)
  * @param dst V2 endpoint per edge (sorted order)
  * @param w   edge weight per edge, in [0, 1] (sorted order)
  */
final class SimGraph private (
    val n1: Int,
    val n2: Int,
    val src: Array[Int],
    val dst: Array[Int],
    val w: Array[Double],
) {

  /** Number of edges. */
  def m: Int = src.length

  /** Total number of nodes n = |V1 ∪ V2|. */
  def n: Int = n1 + n2

  /** Number of edges with weight strictly greater than `t` (a prefix
    * length, since edges are weight-descending).
    */
  def prefixAbove(t: Double): Int = {
    // Binary search for the first index with w <= t.
    var lo = 0; var hi = m
    while (lo < hi) {
      val mid = (lo + hi) >>> 1
      if (w(mid) > t) lo = mid + 1 else hi = mid
    }
    lo
  }

  /** Number of edges with weight greater than or equal to `t`. */
  def prefixAtLeast(t: Double): Int = {
    var lo = 0; var hi = m
    while (lo < hi) {
      val mid = (lo + hi) >>> 1
      if (w(mid) >= t) lo = mid + 1 else hi = mid
    }
    lo
  }

  /** Adjacency lists over the first `len` (highest-weight) edges.
    *
    * Returns, per node, the indices into the edge arrays of its incident
    * edges, each list sorted by the canonical order (weight desc, then
    * ids) because the edge arrays themselves are. V1 node i is slot i;
    * V2 node j is slot n1 + j.
    */
  def adjacency(len: Int): Array[Array[Int]] = {
    val deg = new Array[Int](n)
    var e = 0
    while (e < len) { deg(src(e)) += 1; deg(n1 + dst(e)) += 1; e += 1 }
    val adj = Array.tabulate(n)(i => new Array[Int](deg(i)))
    val fill = new Array[Int](n)
    e = 0
    while (e < len) {
      val a = src(e); val b = n1 + dst(e)
      adj(a)(fill(a)) = e; fill(a) += 1
      adj(b)(fill(b)) = e; fill(b) += 1
      e += 1
    }
    adj
  }

  /** Min-max normalize the weights to [0, 1] (paper §5: applied to every
    * graph regardless of the similarity function). A constant-weight
    * graph maps to all-ones.
    */
  def minMaxNormalized: SimGraph = {
    if (m == 0) return this
    val max = w(0); val min = w(m - 1) // already sorted desc
    val range = max - min
    val nw =
      if (range <= 0) Array.fill(m)(1.0)
      else w.map(x => (x - min) / range)
    new SimGraph(n1, n2, src, dst, nw)
  }
}

object SimGraph {

  /** Build a graph from an unsorted edge list, establishing the canonical
    * (weight desc, src asc, dst asc) order. Edges with non-positive weight
    * are dropped (the paper's graphs contain pairs with similarity > 0).
    */
  def fromEdges(n1: Int, n2: Int, edges: Iterable[(Int, Int, Double)]): SimGraph = {
    val kept = edges.iterator.filter(_._3 > 0.0).toArray
    java.util.Arrays.sort(
      kept,
      new java.util.Comparator[(Int, Int, Double)] {
        override def compare(a: (Int, Int, Double), b: (Int, Int, Double)): Int = {
          val c = java.lang.Double.compare(b._3, a._3)
          if (c != 0) c
          else {
            val c2 = Integer.compare(a._1, b._1)
            if (c2 != 0) c2 else Integer.compare(a._2, b._2)
          }
        }
      },
    )
    val src = new Array[Int](kept.length)
    val dst = new Array[Int](kept.length)
    val w = new Array[Double](kept.length)
    var i = 0
    while (i < kept.length) {
      val e = kept(i)
      require(e._1 >= 0 && e._1 < n1, s"src ${e._1} out of [0,$n1)")
      require(e._2 >= 0 && e._2 < n2, s"dst ${e._2} out of [0,$n2)")
      src(i) = e._1; dst(i) = e._2; w(i) = e._3
      i += 1
    }
    new SimGraph(n1, n2, src, dst, w)
  }
}
