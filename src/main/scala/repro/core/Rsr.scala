package repro.core

/** Ricochet Sequential Rippling Clustering (RSR) — paper Algorithm 1,
  * adapted for CCER so every cluster holds at most one entity per side.
  *
  * After pruning edges with weight ≤ t, nodes of both collections are
  * visited in decreasing order of the average weight of their adjacent
  * edges. A visited seed grabs its first adjacent vertex that is either
  * unassigned or closer to it than to its current center; a center whose
  * partition thereby shrinks to a singleton is re-assigned to its nearest
  * single-node cluster. O(n·m) worst case.
  *
  * The pseudocode leaves a few states underspecified; this implementation
  * resolves them deterministically and keeps all partitions valid (≤ 2
  * members, one per side, each node in ≤ 1 partition):
  *  - adjacency is walked in decreasing weight (canonical edge order);
  *  - grabbing an *unassigned* vertex orphans no center, so nothing is
  *    queued for re-assignment in that case;
  *  - a node promoted to center by a re-assignment keeps its pair and
  *    does not grab again when later visited;
  *  - centers are never stolen (pseudocode line 12).
  */
final class Rsr extends Matcher {
  override def code: String = "RSR"
  override def name: String = "Ricochet Sequential Rippling Clustering"

  private val Unassigned = 0
  private val Center = 1
  private val Member = 2

  override def run(g: SimGraph, t: Double): MatchResult = {
    val len = g.prefixAbove(t)
    val adj = g.adjacency(len)

    // Average adjacent weight per node (0 for isolated nodes).
    val avgW = new Array[Double](g.n)
    var v = 0
    while (v < g.n) {
      val es = adj(v)
      if (es.nonEmpty) {
        var s = 0.0; var k = 0
        while (k < es.length) { s += g.w(es(k)); k += 1 }
        avgW(v) = s / es.length
      }
      v += 1
    }
    val order = Array.tabulate(g.n)(identity).sortBy(v => (-avgW(v), v))

    val role = new Array[Int](g.n)
    val partner = Array.fill(g.n)(-1)
    val simWithCenter = new Array[Double](g.n) // members: weight to center

    @inline def other(node: Int, e: Int): Int =
      if (node < g.n1) g.n1 + g.dst(e) else g.src(e)

    @inline def isSingle(x: Int): Boolean =
      role(x) == Unassigned || (role(x) == Center && partner(x) == -1)

    val toReassign = new java.util.ArrayDeque[Integer]()
    var oi = 0
    while (oi < order.length) {
      val vi = order(oi); oi += 1
      val canGrab = role(vi) != Center || partner(vi) == -1
      if (canGrab && adj(vi).nonEmpty) {
        // Find the first adjacent vertex that is unassigned or closer to
        // vi than to its current center (walked in decreasing weight).
        var grabbed = -1; var grabbedW = 0.0
        val es = adj(vi)
        var k = 0
        while (k < es.length && grabbed < 0) {
          val e = es(k)
          val vj = other(vi, e)
          if (role(vj) != Center && vj != partner(vi) && g.w(e) > simWithCenter(vj)) {
            grabbed = vj; grabbedW = g.w(e)
          }
          k += 1
        }
        if (grabbed >= 0) {
          // Detach grabbed from its previous center, if any.
          if (role(grabbed) == Member) {
            val c = partner(grabbed)
            partner(c) = -1
            toReassign.addLast(c)
          }
          // Detach vi from its previous center, if any.
          if (role(vi) == Member) {
            val c = partner(vi)
            partner(c) = -1
            toReassign.addLast(c)
          }
          role(vi) = Center; partner(vi) = grabbed; simWithCenter(vi) = 1.0
          role(grabbed) = Member; partner(grabbed) = vi
          simWithCenter(grabbed) = grabbedW
        }
        // Re-assign orphaned singleton centers to their nearest
        // single-node cluster.
        while (!toReassign.isEmpty) {
          val vk = toReassign.removeFirst().intValue()
          if (role(vk) == Center && partner(vk) == -1) {
            val esk = adj(vk)
            var k2 = 0; var best = -1; var bestW = 0.0
            while (k2 < esk.length && best < 0) {
              val e = esk(k2)
              val vl = other(vk, e)
              if (isSingle(vl)) { best = vl; bestW = g.w(e) }
              k2 += 1
            }
            if (best >= 0) {
              // {best} becomes the cluster's center; vk joins as member.
              role(best) = Center; partner(best) = vk; simWithCenter(best) = 1.0
              role(vk) = Member; partner(vk) = best; simWithCenter(vk) = bestW
            }
          }
        }
      }
    }

    val out = Array.newBuilder[(Int, Int)]
    var c = 0
    while (c < g.n) {
      if (role(c) == Center && partner(c) >= 0) {
        val p = partner(c)
        if (c < g.n1) out += ((c, p - g.n1)) else out += ((p, c - g.n1))
      }
      c += 1
    }
    MatchResult(out.result())
  }
}
