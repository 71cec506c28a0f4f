package repro.core

import repro.SparkSpec

/** The worked example of the paper's Figure 1, used as an end-to-end
  * check of every algorithm. V1 = {A1..A5} (ids 0..4), V2 = {B1..B4}
  * (ids 0..3); threshold 0.5.
  *
  * Edges: A1-B1 0.6, A5-B1 0.9, A5-B3 0.6, A2-B2 0.8, A3-B4 0.7.
  */
class Figure1Spec extends SparkSpec {
  private val A1 = 0; private val A2 = 1; private val A3 = 2; private val A5 = 4
  private val B1 = 0; private val B2 = 1; private val B3 = 2; private val B4 = 3

  private val g = SimGraph.fromEdges(
    5, 4,
    Seq((A1, B1, 0.6), (A5, B1, 0.9), (A5, B3, 0.6), (A2, B2, 0.8), (A3, B4, 0.7)),
  )
  private val t = 0.5

  private val figC = Set((A1, B1), (A5, B3), (A2, B2), (A3, B4)) // max total weight
  private val figD = Set((A5, B1), (A2, B2), (A3, B4))           // greedy / mutual-best

  private val weightOf: Map[(Int, Int), Double] = Map(
    (A1, B1) -> 0.6, (A5, B1) -> 0.9, (A5, B3) -> 0.6, (A2, B2) -> 0.8, (A3, B4) -> 0.7)

  test("CNC discards the 4-node component and keeps the two valid clusters (fig 1b)") {
    assert(Matchers.cnc.run(g, t).pairSet == Set((A2, B2), (A3, B4)))
  }

  test("RCA finds the maximum-weight assignment (fig 1c)") {
    assert(Matchers.rca.run(g, t).pairSet == figC)
  }

  test("RCA pass 1 beats pass 2 on total weight (2.7 vs 2.4)") {
    // Pass 1 (from V1): A1-B1 .6 + A2-B2 .8 + A3-B4 .7 + A5-B3 .6 = 2.7.
    // Pass 2 (from V2): B1-A5 .9 + B2-A2 .8 + B4-A3 .7 = 2.4.
    val total = Matchers.rca.run(g, t).pairs.map(weightOf).sum
    assert(math.abs(total - 2.7) < 1e-12)
  }

  test("BAH reaches the optimal assignment value (fig 1c)") {
    val total = Matchers.bah.run(g, t).pairs.map(weightOf).sum
    assert(math.abs(total - 2.7) < 1e-12)
  }

  test("UMC greedily matches the top-weighted pairs (fig 1d)") {
    assert(Matchers.umc.run(g, t).pairSet == figD)
  }

  test("EXC keeps only mutual best matches (fig 1d)") {
    assert(Matchers.exc.run(g, t).pairSet == figD)
  }

  test("BMC with basis V2 reproduces fig 1d") {
    assert(new Bmc(basisV1 = false).run(g, t).pairSet == figD)
  }

  test("BMC with basis V1 lets A1 take B1 first (fig 1c)") {
    assert(new Bmc(basisV1 = true).run(g, t).pairSet == figC)
  }

  test("KRC lets A5 displace A1 at B1 (fig 1d)") {
    assert(Matchers.krc.run(g, t).pairSet == figD)
  }

  test("RSR produces a valid full matching of the component") {
    val r = Matchers.rsr.run(g, t)
    assert(r.isValidMatching)
    // B1 (avg .75) ripples: it re-grabs A1, orphaning A5 onto B3 — the
    // maximum-weight outcome (fig 1c). The paper notes RSR's outcome
    // depends on the vertex sequence; ours is deterministic.
    assert(r.pairSet == figC)
  }

  test("all algorithms return valid matchings on the example") {
    for (m <- Matchers.all)
      assert(m.run(g, t).isValidMatching, s"${m.code} produced an invalid matching")
  }

  test("at threshold 0.95 no algorithm outputs any pair") {
    for (m <- Matchers.all)
      assert(m.run(g, 0.95).pairs.isEmpty, s"${m.code} matched above max weight")
  }
}
