package repro.core

/** Row Column Assignment Clustering (RCA) — paper Algorithm 3, based on
  * Kurtzberg's Row-Column Scan approximation to the assignment problem.
  *
  * Two passes over the graph: pass 1 assigns to each V1 entity (in id
  * order) its most similar currently-unassigned V2 entity; pass 2 does
  * the symmetric scan from V2. The pass with the larger total assigned
  * weight wins, after which pairs with similarity < t are discarded.
  * Both passes ignore `t` (the assignment problem assumes a complete
  * bipartite graph; absent edges have similarity 0 and such pairs are
  * never formed here since a node with no unassigned neighbour simply
  * stays a singleton — a 0-weight pair would be filtered anyway).
  * O(|V1|·|V2|) in the dense formulation; O(m) here over actual edges.
  */
final class Rca extends Matcher {
  override def code: String = "RCA"
  override def name: String = "Row Column Assignment Clustering"

  /** Run both scans on all positive-weight edges; returns the winning
    * solution's pairs with their similarities (before the t filter).
    */
  private def solve(g: SimGraph): Array[(Int, Int, Double)] = {
    val adj = g.adjacency(g.m)

    def scan(fromV1: Boolean): (Array[(Int, Int, Double)], Double) = {
      val nBasis = if (fromV1) g.n1 else g.n2
      val matchedOther = new Array[Boolean](if (fromV1) g.n2 else g.n1)
      val pairs = Array.newBuilder[(Int, Int, Double)]
      var total = 0.0
      var i = 0
      while (i < nBasis) {
        val es = adj(if (fromV1) i else g.n1 + i)
        var k = 0; var done = false
        while (k < es.length && !done) {
          val e = es(k)
          val other = if (fromV1) g.dst(e) else g.src(e)
          if (!matchedOther(other)) {
            matchedOther(other) = true
            total += g.w(e)
            pairs += (if (fromV1) (i, other, g.w(e)) else (other, i, g.w(e)))
            done = true
          }
          k += 1
        }
        i += 1
      }
      (pairs.result(), total)
    }

    val (c1, d1) = scan(fromV1 = true)
    val (c2, d2) = scan(fromV1 = false)
    if (d1 >= d2) c1 else c2
  }

  override def run(g: SimGraph, t: Double): MatchResult =
    MatchResult(solve(g).collect { case (i, j, s) if s >= t => (i, j) })

  override def prepare(g: SimGraph): Double => MatchResult = {
    val solution = solve(g)
    t => MatchResult(solution.collect { case (i, j, s) if s >= t => (i, j) })
  }
}
