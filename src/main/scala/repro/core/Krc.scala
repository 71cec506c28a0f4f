package repro.core

/** Király's Clustering (KRC) — paper Algorithm 7, an adaptation of
  * Király's linear-time 3/2-approximation to maximum stable marriage.
  *
  * V1 entities ("men") propose along their above-threshold edges in
  * decreasing-weight order; V2 entities ("women") accept a proposal when
  * free, or trade up when the new proposer's edge is heavier (ties favour
  * a proposer on his second chance, Király's flag trick; remaining ties
  * keep the incumbent). A man whose preference list is exhausted while
  * still free gets his list restored exactly once (the "second chance").
  * O(n + m log m); the log factor is the per-man preference sort, already
  * paid by the graph's canonical edge order.
  */
final class Krc extends Matcher {
  override def code: String = "KRC"
  override def name: String = "Kiraly's Clustering"

  override def run(g: SimGraph, t: Double): MatchResult = {
    val len = g.prefixAbove(t)
    val adj = g.adjacency(len) // per-man edge lists, decreasing weight

    val queuePos = new Array[Int](g.n1)     // next proposal index per man
    val lastChance = new Array[Boolean](g.n1)
    val fiance = Array.fill(g.n2)(-1)       // current man per woman
    val fianceW = new Array[Double](g.n2)   // weight of current engagement
    val engagedTo = Array.fill(g.n1)(-1)    // current woman per man

    val freeM = new java.util.ArrayDeque[Integer]()
    var i = 0
    while (i < g.n1) { if (adj(i).nonEmpty) freeM.addLast(i); i += 1 }

    while (!freeM.isEmpty) {
      val vi = freeM.removeFirst().intValue()
      val es = adj(vi)
      if (queuePos(vi) < es.length) {
        val e = es(queuePos(vi)); queuePos(vi) += 1
        val vj = g.dst(e); val wij = g.w(e)
        val cur = fiance(vj)
        val accepts =
          cur < 0 ||
            wij > fianceW(vj) ||
            (wij == fianceW(vj) && lastChance(vi) && !lastChance(cur))
        if (accepts) {
          if (cur >= 0) { engagedTo(cur) = -1; freeM.addLast(cur) } // break-up
          fiance(vj) = vi; fianceW(vj) = wij; engagedTo(vi) = vj
        } else {
          freeM.addLast(vi) // rejected: keep proposing down the list
        }
      } else if (!lastChance(vi)) {
        // Second chance: restore the initial preference list once.
        lastChance(vi) = true
        queuePos(vi) = 0
        freeM.addLast(vi)
      }
      // else: both chances spent — vi stays a singleton.
    }

    val out = Array.newBuilder[(Int, Int)]
    var j = 0
    while (j < g.n2) { if (fiance(j) >= 0) out += ((fiance(j), j)); j += 1 }
    MatchResult(out.result())
  }
}
