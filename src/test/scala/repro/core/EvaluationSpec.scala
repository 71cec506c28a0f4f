package repro.core

import repro.SparkSpec

class EvaluationSpec extends SparkSpec {
  import Evaluation._

  private val gt = new GroundTruth(Seq((0, 0), (1, 1), (2, 2), (3, 3)))

  test("perfect output scores 1/1/1") {
    val prf = evaluate(MatchResult(Array((0, 0), (1, 1), (2, 2), (3, 3))), gt)
    assert(prf.precision == 1.0 && prf.recall == 1.0 && prf.f1 == 1.0)
  }

  test("precision counts only correct output clusters") {
    val prf = evaluate(MatchResult(Array((0, 0), (1, 2))), gt)
    assert(prf.precision == 0.5)
    assert(prf.recall == 0.25)
  }

  test("empty output has zero precision, recall and F1") {
    val prf = evaluate(MatchResult(Array.empty), gt)
    assert(prf.precision == 0.0 && prf.recall == 0.0 && prf.f1 == 0.0)
  }

  test("f1 is the harmonic mean") {
    val prf = PRF(0.5, 1.0)
    assert(math.abs(prf.f1 - 2.0 / 3.0) < 1e-12)
  }

  test("f1 is zero when both measures are zero") {
    assert(PRF(0.0, 0.0).f1 == 0.0)
  }

  test("ground truth membership is exact on ids") {
    assert(gt.contains(2, 2))
    assert(!gt.contains(2, 3))
    assert(!gt.contains(3, 2))
  }

  test("ground truth with large ids packs without collision") {
    val big = new GroundTruth(Seq((1000000, 2000000)))
    assert(big.contains(1000000, 2000000))
    assert(!big.contains(2000000, 1000000))
  }

  test("recall denominator is the ground-truth size") {
    val prf = evaluate(MatchResult(Array((0, 0), (1, 1))), gt)
    assert(prf.recall == 0.5)
    assert(prf.precision == 1.0)
  }
}

class ThresholdSweepSpec extends SparkSpec {
  import Evaluation._

  test("grid is 0.05..1.00 step 0.05") {
    assert(ThresholdSweep.grid.length == 20)
    assert(math.abs(ThresholdSweep.grid.head - 0.05) < 1e-12)
    assert(math.abs(ThresholdSweep.grid.last - 1.0) < 1e-12)
  }

  test("sweep selects the largest threshold achieving the best F1") {
    // True pairs have weight .8/.9; a false pair has .3. Any t in
    // [0.3, 0.8) gives perfect F1 for UMC; the sweep must pick t=0.75
    // (largest grid value below 0.8, since UMC keeps w > t).
    val g = SimGraph.fromEdges(3, 3, Seq((0, 0, 0.9), (1, 1, 0.8), (2, 2, 0.3)))
    val gt = new GroundTruth(Seq((0, 0), (1, 1)))
    val out = ThresholdSweep.sweep(Matchers.umc, g, gt, timedReps = 0)
    assert(out.prf.f1 == 1.0)
    assert(math.abs(out.bestT - 0.75) < 1e-9)
  }

  test("sweep reports timing when reps requested") {
    val g = SimGraph.fromEdges(2, 2, Seq((0, 0, 0.9), (1, 1, 0.8)))
    val gt = new GroundTruth(Seq((0, 0), (1, 1)))
    val out = ThresholdSweep.sweep(Matchers.umc, g, gt, timedReps = 3)
    assert(out.runtimeMs >= 0.0)
  }

  test("sweepBmc retains the better basis") {
    // Basis V1 lets entity 0 steal B0 (wrong); basis V2 gets both right.
    val g = SimGraph.fromEdges(2, 2, Seq((0, 0, 0.6), (1, 0, 0.9), (0, 1, 0.5)))
    val gt = new GroundTruth(Seq((1, 0), (0, 1)))
    val out = ThresholdSweep.sweepBmc(g, gt, timedReps = 0)
    assert(out.matcher == "BMC")
    assert(out.prf.f1 == 1.0)
    assert(!out.bmcBasisV1)
  }

  test("sweepAll covers all eight algorithm codes") {
    val g = SimGraph.fromEdges(2, 2, Seq((0, 0, 0.9), (1, 1, 0.8)))
    val gt = new GroundTruth(Seq((0, 0), (1, 1)))
    val all = ThresholdSweep.sweepAll(g, gt, timedReps = 0)
    assert(all.keySet == Set("CNC", "RSR", "RCA", "BAH", "BMC", "EXC", "KRC", "UMC"))
    assert(all("UMC").prf.f1 == 1.0)
    assert(all("CNC").prf.f1 == 1.0)
  }

  test("sweep on an all-noise graph reports zero F1") {
    val g = SimGraph.fromEdges(2, 2, Seq((0, 1, 0.9), (1, 0, 0.8)))
    val gt = new GroundTruth(Seq((0, 0), (1, 1)))
    val out = ThresholdSweep.sweep(Matchers.umc, g, gt, timedReps = 0)
    assert(out.prf.f1 == 0.0)
    // Ties at F1=0 resolve to the largest threshold on the grid.
    assert(math.abs(out.bestT - 1.0) < 1e-9)
  }
}
