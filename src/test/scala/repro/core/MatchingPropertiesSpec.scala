package repro.core

import org.scalacheck.Gen
import repro.{PropSupport, SparkSpec}

/** Property-based invariants every matcher must satisfy on random
  * bipartite graphs (distinct edge weights, so tie behaviour is moot).
  */
class MatchingPropertiesSpec extends SparkSpec with PropSupport {

  private val genGraph: Gen[SimGraph] = for {
    n1 <- Gen.choose(1, 12)
    n2 <- Gen.choose(1, 12)
    m <- Gen.choose(0, n1 * n2)
    pairs <- Gen.pick(m, for { i <- 0 until n1; j <- 0 until n2 } yield (i, j))
  } yield {
    val edges = pairs.zipWithIndex.map { case ((i, j), k) =>
      // Distinct, reproducible weights in (0.05, 0.95).
      (i, j, 0.05 + 0.9 * ((((i * 131 + j * 31 + k) * 2654435761L) & 0xfffff).toDouble / 1048576.0))
    }
    SimGraph.fromEdges(n1, n2, edges.toSeq)
  }

  private val genT: Gen[Double] = Gen.choose(1, 19).map(_ * 0.05)

  for (matcher <- Matchers.all) {
    test(s"${matcher.code}: output is a valid 1-1 matching") {
      forAllSamples2(genGraph, genT) { (g, t) =>
        assert(matcher.run(g, t).isValidMatching)
      }
    }

    test(s"${matcher.code}: every output pair is an actual edge with weight >= t") {
      forAllSamples2(genGraph, genT) { (g, t) =>
        val wOf = g.src.indices.map(e => (g.src(e), g.dst(e)) -> g.w(e)).toMap
        assert(matcher.run(g, t).pairs.forall(p => wOf.get(p).exists(_ >= t)))
      }
    }

    test(s"${matcher.code}: deterministic across repeated runs") {
      forAllSamples2(genGraph, genT, n = 30) { (g, t) =>
        assert(matcher.run(g, t).pairSet == matcher.run(g, t).pairSet)
      }
    }

    test(s"${matcher.code}: prepare agrees with run on every grid threshold") {
      forAllSamples(genGraph, n = 20) { g =>
        val prepared = matcher.prepare(g)
        for (t <- ThresholdSweep.grid)
          assert(prepared(t).pairSet == matcher.run(g, t).pairSet, s"${matcher.code} t=$t")
      }
    }
  }

  test("EXC pairs are a subset of UMC pairs (distinct weights)") {
    forAllSamples2(genGraph, genT) { (g, t) =>
      assert(Matchers.exc.run(g, t).pairSet.subsetOf(Matchers.umc.run(g, t).pairSet))
    }
  }

  test("UMC produces a maximal matching of the pruned graph") {
    forAllSamples2(genGraph, genT) { (g, t) =>
      val r = Matchers.umc.run(g, t)
      val m1 = r.pairs.map(_._1).toSet
      val m2 = r.pairs.map(_._2).toSet
      for (e <- 0 until g.prefixAbove(t))
        assert(m1.contains(g.src(e)) || m2.contains(g.dst(e)))
    }
  }

  test("CNC 2-clusters (isolated edges) are always mutual best: CNC subset of EXC") {
    forAllSamples2(genGraph, genT) { (g, t) =>
      val cnc = Matchers.cnc.run(g, math.nextUp(t)).pairSet // strict > t, like EXC
      assert(cnc.subsetOf(Matchers.exc.run(g, t).pairSet))
    }
  }

  test("KRC matches at least as many pairs as EXC (distinct weights)") {
    // EXC only keeps mutual bests; KRC's proposals extend them greedily.
    forAllSamples2(genGraph, genT) { (g, t) =>
      assert(Matchers.krc.run(g, t).pairs.length >= Matchers.exc.run(g, t).pairs.length)
    }
  }
}
