package repro.core

import repro.SparkSpec

/** Targeted unit tests per algorithm, beyond the Figure 1 example. */
class AlgorithmSpec extends SparkSpec {

  private def g(edges: (Int, Int, Double)*): SimGraph = {
    val n1 = edges.map(_._1).maxOption.getOrElse(-1) + 1
    val n2 = edges.map(_._2).maxOption.getOrElse(-1) + 1
    SimGraph.fromEdges(math.max(n1, 1), math.max(n2, 1), edges)
  }

  // ---------------------------------------------------------------- CNC
  test("CNC keeps edges with weight equal to the threshold") {
    assert(Matchers.cnc.run(g((0, 0, 0.5)), 0.5).pairSet == Set((0, 0)))
  }

  test("CNC drops components larger than two nodes") {
    // 0-0, 1-0 share V2 node 0 -> 3-node component, all discarded.
    assert(Matchers.cnc.run(g((0, 0, 0.9), (1, 0, 0.8)), 0.5).pairs.isEmpty)
  }

  test("CNC keeps multiple independent 2-clusters") {
    val r = Matchers.cnc.run(g((0, 0, 0.9), (1, 1, 0.8), (2, 2, 0.7)), 0.5)
    assert(r.pairSet == Set((0, 0), (1, 1), (2, 2)))
  }

  test("CNC pruning splits a chain into valid pairs") {
    // chain a0-b0 (.9) - a1 (.4) - b1 (.8): pruning the .4 edge at t=.5
    // leaves two separate 2-clusters.
    val r = Matchers.cnc.run(g((0, 0, 0.9), (1, 0, 0.4), (1, 1, 0.8)), 0.5)
    assert(r.pairSet == Set((0, 0), (1, 1)))
  }

  test("CNC on an empty graph returns nothing") {
    assert(Matchers.cnc.run(SimGraph.fromEdges(3, 3, Seq.empty), 0.5).pairs.isEmpty)
  }

  // ---------------------------------------------------------------- UMC
  test("UMC excludes edges with weight exactly t") {
    assert(Matchers.umc.run(g((0, 0, 0.5)), 0.5).pairs.isEmpty)
    assert(Matchers.umc.run(g((0, 0, 0.51)), 0.5).pairSet == Set((0, 0)))
  }

  test("UMC respects the unique mapping constraint under contention") {
    val r = Matchers.umc.run(g((0, 0, 0.9), (1, 0, 0.8), (1, 1, 0.7)), 0.1)
    assert(r.pairSet == Set((0, 0), (1, 1)))
  }

  test("UMC takes heavier edges first even when discovered later") {
    val r = Matchers.umc.run(g((0, 0, 0.3), (1, 0, 0.9)), 0.1)
    assert(r.pairSet == Set((1, 0)))
  }

  test("UMC tie-break is deterministic by (src, dst)") {
    val r = Matchers.umc.run(g((0, 0, 0.5), (1, 0, 0.5), (0, 1, 0.5)), 0.1)
    assert(r.pairSet == Set((0, 0))) // (0,0) precedes (0,1) and (1,0)
  }

  // ---------------------------------------------------------------- BMC
  test("BMC basis V1 walks V1 in id order") {
    val r = new Bmc(basisV1 = true).run(g((0, 0, 0.6), (1, 0, 0.9)), 0.1)
    assert(r.pairSet == Set((0, 0))) // entity 0 grabs B0 before entity 1
  }

  test("BMC basis V2 walks V2 in id order") {
    val r = new Bmc(basisV1 = false).run(g((0, 0, 0.6), (0, 1, 0.9)), 0.1)
    assert(r.pairSet == Set((0, 0)))
  }

  test("BMC falls through to the next-best unmatched candidate") {
    val r = new Bmc(basisV1 = true).run(
      g((0, 0, 0.9), (1, 0, 0.8), (1, 1, 0.6)), 0.1)
    assert(r.pairSet == Set((0, 0), (1, 1)))
  }

  test("BMC ignores edges at or below t") {
    assert(new Bmc(basisV1 = true).run(g((0, 0, 0.5)), 0.5).pairs.isEmpty)
  }

  // ---------------------------------------------------------------- EXC
  test("EXC rejects one-directional best matches") {
    // 0's best is b0, but b0's best is 1.
    val r = Matchers.exc.run(g((0, 0, 0.6), (1, 0, 0.9), (1, 1, 0.95)), 0.1)
    // 1's best is b1 (.95) and b1's best is 1 -> pair; b0's best is 1 but
    // 1's best is b1 -> no pair; 0-b0 not mutual (b0 prefers 1).
    assert(r.pairSet == Set((1, 1)))
  }

  test("EXC matches symmetric stars only at their centers") {
    val r = Matchers.exc.run(g((0, 0, 0.9), (0, 1, 0.5), (1, 0, 0.5)), 0.1)
    assert(r.pairSet == Set((0, 0)))
  }

  test("EXC is a subset of UMC for distinct weights") {
    val graph = g((0, 0, 0.9), (0, 1, 0.8), (1, 0, 0.7), (1, 1, 0.6), (2, 2, 0.5))
    val exc = Matchers.exc.run(graph, 0.1).pairSet
    val umc = Matchers.umc.run(graph, 0.1).pairSet
    assert(exc.subsetOf(umc))
  }

  // ---------------------------------------------------------------- RCA
  test("RCA picks the pass with the larger total weight") {
    // From V1: 0 takes b0 (.9), 1 takes b1 (.2) -> 1.1.
    // From V2: b0 takes 0 (.9), b1 takes 1 (.2) -> same here; make asymmetric:
    val graph = g((0, 0, 0.9), (0, 1, 0.8), (1, 0, 0.7))
    // pass1: 0->b0(.9), 1->? 1's only edge b0 taken -> D1=0.9
    // pass2: b0->0(.9), b1->0 taken -> D2=0.9; tie -> pass1 kept.
    val r = Matchers.rca.run(graph, 0.1)
    assert(r.pairSet == Set((0, 0)))
  }

  test("RCA assigns below-threshold pairs during the scan but filters them at the end") {
    // 1 is forced onto the weak edge (1,1,0.3), which the t=0.5 filter removes.
    val r = Matchers.rca.run(g((0, 0, 0.9), (1, 0, 0.8), (1, 1, 0.3)), 0.5)
    assert(r.pairSet == Set((0, 0)))
  }

  test("RCA keeps pairs with weight exactly t") {
    assert(Matchers.rca.run(g((0, 0, 0.5)), 0.5).pairSet == Set((0, 0)))
  }

  test("RCA prepare is equivalent to run across thresholds") {
    val graph = g((0, 0, 0.9), (1, 0, 0.8), (1, 1, 0.3), (2, 1, 0.6), (2, 2, 0.4))
    val prepared = Matchers.rca.prepare(graph)
    for (t <- ThresholdSweep.grid)
      assert(prepared(t).pairSet == Matchers.rca.run(graph, t).pairSet, s"t=$t")
  }

  // ---------------------------------------------------------------- BAH
  test("BAH output only contains above-threshold pairs") {
    val r = Matchers.bah.run(g((0, 0, 0.9), (1, 1, 0.4)), 0.5)
    assert(r.pairSet == Set((0, 0)))
  }

  test("BAH is deterministic for identical inputs") {
    val graph = g((0, 0, 0.9), (0, 1, 0.6), (1, 0, 0.5), (1, 1, 0.8), (2, 0, 0.3))
    val a = Matchers.bah.run(graph, 0.1).pairSet
    val b = Matchers.bah.run(graph, 0.1).pairSet
    assert(a == b)
  }

  test("BAH handles V2 larger than V1") {
    val r = Matchers.bah.run(g((0, 0, 0.9), (0, 3, 0.5)), 0.1)
    assert(r.isValidMatching)
    assert(r.pairSet == Set((0, 0)))
  }

  test("BAH finds the optimum on a 2x2 crossing") {
    // pairing (0-b1, 1-b0) = 1.4 beats (0-b0, 1-b1) = 1.0.
    val r = Matchers.bah.run(g((0, 0, 0.9), (0, 1, 0.7), (1, 0, 0.7), (1, 1, 0.1)), 0.05)
    val total = r.pairs.map {
      case (0, 0) => 0.9; case (0, 1) => 0.7; case (1, 0) => 0.7; case (1, 1) => 0.1
    }.sum
    assert(math.abs(total - 1.4) < 1e-12)
  }

  // ---------------------------------------------------------------- KRC
  test("KRC lets a heavier proposal displace an engagement") {
    val r = Matchers.krc.run(g((0, 0, 0.6), (1, 0, 0.9)), 0.1)
    assert(r.pairSet == Set((1, 0)))
  }

  test("KRC displaced man proposes onward") {
    val r = Matchers.krc.run(g((0, 0, 0.6), (0, 1, 0.5), (1, 0, 0.9)), 0.1)
    assert(r.pairSet == Set((1, 0), (0, 1)))
  }

  test("KRC tie handling: second-chance proposer wins indifference, then stabilizes") {
    // Both men value B0 at 0.6. Man 0 engages first; man 1 is rejected,
    // spends his second chance, and — per Király's flag rule — wins the
    // indifferent woman from the flagless incumbent. Man 0 then burns his
    // own second chance but cannot displace another flagged man.
    val r = Matchers.krc.run(g((0, 0, 0.6), (1, 0, 0.6)), 0.1)
    assert(r.pairSet == Set((1, 0)))
    assert(r.isValidMatching)
  }

  test("KRC matches a perfect diagonal") {
    val r = Matchers.krc.run(g((0, 0, 0.9), (1, 1, 0.8), (2, 2, 0.7)), 0.1)
    assert(r.pairSet == Set((0, 0), (1, 1), (2, 2)))
  }

  test("KRC terminates on a dense contention graph") {
    val edges = for (i <- 0 until 8; j <- 0 until 8)
      yield (i, j, 0.1 + ((i * 7 + j * 3) % 17) / 20.0)
    val r = Matchers.krc.run(g(edges: _*), 0.1)
    assert(r.isValidMatching)
    assert(r.pairs.length == 8) // complete graph -> perfect matching
  }

  // ---------------------------------------------------------------- RSR
  test("RSR matches a perfect diagonal") {
    val r = Matchers.rsr.run(g((0, 0, 0.9), (1, 1, 0.8), (2, 2, 0.7)), 0.1)
    assert(r.pairSet == Set((0, 0), (1, 1), (2, 2)))
  }

  test("RSR reassigns an orphaned center to its nearest single node") {
    // Seed order by avg weight: node V2#0 (avg .85) grabs A0 (.9);
    // then A1 (avg .8)... construct the Figure-1-like ricochet:
    val r = Matchers.rsr.run(g((0, 0, 0.9), (1, 0, 0.8), (1, 1, 0.7)), 0.1)
    assert(r.isValidMatching)
    assert(r.pairs.length == 2) // both V1 nodes end up matched
  }

  test("RSR output is threshold-pruned") {
    assert(Matchers.rsr.run(g((0, 0, 0.4)), 0.5).pairs.isEmpty)
  }

  test("RSR is deterministic") {
    val graph = g((0, 0, 0.9), (0, 1, 0.6), (1, 0, 0.5), (1, 1, 0.8), (2, 0, 0.3))
    assert(Matchers.rsr.run(graph, 0.1).pairSet == Matchers.rsr.run(graph, 0.1).pairSet)
  }

  // ------------------------------------------------------------ registry
  test("registry exposes the eight algorithms in paper order") {
    assert(Matchers.all.map(_.code) == Seq("CNC", "RSR", "RCA", "BAH", "BMC", "EXC", "KRC", "UMC"))
  }

  test("registry lookup is case-insensitive and rejects unknown codes") {
    assert(Matchers.byCode("umc").code == "UMC")
    intercept[IllegalArgumentException](Matchers.byCode("XXX"))
  }
}
