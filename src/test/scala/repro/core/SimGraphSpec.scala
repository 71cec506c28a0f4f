package repro.core

import repro.SparkSpec

class SimGraphSpec extends SparkSpec {

  private def g3 = SimGraph.fromEdges(2, 3, Seq((0, 0, 0.5), (0, 1, 0.9), (1, 2, 0.7)))

  test("fromEdges sorts by weight descending") {
    assert(g3.w.toSeq == Seq(0.9, 0.7, 0.5))
  }

  test("fromEdges breaks weight ties by (src, dst)") {
    val g = SimGraph.fromEdges(2, 2, Seq((1, 0, 0.5), (0, 1, 0.5), (0, 0, 0.5)))
    assert(g.src.toSeq == Seq(0, 0, 1))
    assert(g.dst.toSeq == Seq(0, 1, 0))
  }

  test("fromEdges drops non-positive weights") {
    val g = SimGraph.fromEdges(2, 2, Seq((0, 0, 0.0), (0, 1, -0.3), (1, 1, 0.4)))
    assert(g.m == 1)
  }

  test("fromEdges rejects out-of-range node ids") {
    intercept[IllegalArgumentException](SimGraph.fromEdges(1, 1, Seq((1, 0, 0.5))))
    intercept[IllegalArgumentException](SimGraph.fromEdges(1, 1, Seq((0, 2, 0.5))))
  }

  test("m and n report edge and node counts") {
    assert(g3.m == 3)
    assert(g3.n == 5)
    assert(g3.n1 == 2 && g3.n2 == 3)
  }

  test("prefixAbove returns count of edges strictly above t") {
    assert(g3.prefixAbove(0.7) == 1)
    assert(g3.prefixAbove(0.69) == 2)
    assert(g3.prefixAbove(0.0) == 3)
    assert(g3.prefixAbove(0.9) == 0)
  }

  test("prefixAtLeast includes edges equal to t") {
    assert(g3.prefixAtLeast(0.7) == 2)
    assert(g3.prefixAtLeast(0.9) == 1)
    assert(g3.prefixAtLeast(0.91) == 0)
  }

  test("prefixAbove on empty graph is 0") {
    val g = SimGraph.fromEdges(1, 1, Seq.empty)
    assert(g.prefixAbove(0.5) == 0)
  }

  test("minMaxNormalized maps weights to [0,1] with max->1 min->0") {
    val n = g3.minMaxNormalized
    assert(n.w(0) == 1.0)
    assert(n.w(n.m - 1) == 0.0)
    assert(math.abs(n.w(1) - 0.5) < 1e-12)
  }

  test("minMaxNormalized maps constant weights to all ones") {
    val g = SimGraph.fromEdges(2, 2, Seq((0, 0, 0.4), (1, 1, 0.4))).minMaxNormalized
    assert(g.w.forall(_ == 1.0))
  }

  test("adjacency lists cover both endpoints and preserve canonical order") {
    val adj = g3.adjacency(g3.m)
    // node 0 of V1 has two edges, highest weight first
    assert(adj(0).length == 2)
    assert(g3.w(adj(0)(0)) >= g3.w(adj(0)(1)))
    // node 1 of V2 (global id 2+1=3) sees the (0,1,0.9) edge
    assert(adj(3).length == 1)
    assert(g3.w(adj(3)(0)) == 0.9)
  }

  test("adjacency respects the prefix length") {
    val adj = g3.adjacency(1) // only the 0.9 edge
    assert(adj(0).length == 1)
    assert(adj(2).isEmpty) // V2 node 0
  }
}
