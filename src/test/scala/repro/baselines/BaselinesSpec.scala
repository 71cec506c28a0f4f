package repro.baselines

import repro.SparkSpec
import repro.core.{Evaluation, SimGraph}
import repro.data.{CcerGenerator, DatasetSpec}

class BaselinesSpec extends SparkSpec {

  private lazy val ds = CcerGenerator.generate(DatasetSpec.byId("D2"), scale = 0.15)
  private lazy val gt = new Evaluation.GroundTruth(ds.groundTruth)

  test("ZeroErLite fit separates a bimodal sample") {
    val low = Array.tabulate(300)(i => 0.1 + (i % 10) * 0.01)
    val high = Array.tabulate(40)(i => 0.85 + (i % 10) * 0.01)
    val f = ZeroErLite.fit(low ++ high)
    assert(f.muMatch > 0.7)
    assert(f.muNon < 0.3)
    assert(ZeroErLite.posterior(f, 0.9) > 0.9)
    assert(ZeroErLite.posterior(f, 0.1) < 0.1)
  }

  test("ZeroErLite classifies a clean synthetic graph well") {
    // 20 true pairs at ~0.9, 200 noise edges at ~0.2.
    val edges =
      (0 until 20).map(i => (i, i, 0.85 + (i % 5) * 0.02)) ++
        (for (i <- 0 until 20; j <- 0 until 10 if (i + j) % 2 == 0 && i != j)
          yield (i, j, 0.1 + ((i * 7 + j) % 10) * 0.015))
    val g = SimGraph.fromEdges(20, 20, edges)
    val gtLocal = new Evaluation.GroundTruth((0 until 20).map(i => (i, i)))
    val prf = ZeroErLite.evaluate(g, gtLocal)
    assert(prf.f1 > 0.9, s"f1=${prf.f1}")
  }

  test("ZeroErLite evaluateTopK keeps only the top-k edges per V1 entity") {
    // Entity 0 has 12 edges; top-2 candidate selection must only ever
    // declare matches among its two heaviest.
    val edges = (0 until 12).map(j => (0, j, 0.98 - j * 0.08))
    val g = SimGraph.fromEdges(1, 12, edges)
    val gtLocal = new Evaluation.GroundTruth(Seq((0, 0)))
    val prf = ZeroErLite.evaluateTopK(g, gtLocal, k = 2)
    assert(prf.precision >= 0.5 || prf.recall == 0.0)
  }

  test("ZeroErLite survives heavy class imbalance via top-k candidates") {
    val trues = (0 until 30).map(i => (i, i, 0.9 + (i % 5) * 0.01))
    val noise = for (i <- 0 until 30; j <- 0 until 30 if i != j)
      yield (i, j, 0.05 + ((i * 13 + j * 7) % 40) / 100.0)
    val g = SimGraph.fromEdges(30, 30, trues ++ noise)
    val gtLocal = new Evaluation.GroundTruth((0 until 30).map(i => (i, i)))
    assert(ZeroErLite.evaluateTopK(g, gtLocal).f1 > 0.8)
  }

  test("ZeroErLite on an empty graph scores zero") {
    val prf = ZeroErLite.evaluate(SimGraph.fromEdges(2, 2, Seq.empty), gt)
    assert(prf.f1 == 0.0)
  }

  test("DittoLite candidates include every ground-truth pair") {
    val cands = DittoLite.candidates(ds, k = 5).toSet
    assert(ds.groundTruth.forall(cands.contains))
  }

  test("DittoLite features are finite and in range") {
    val f = DittoLite.features(ds, 0, 0)
    assert(f.length == 6)
    assert(f.forall(v => !v.isNaN && !v.isInfinite))
    assert(f.forall(v => v >= -1.0 && v <= 1.0 + 1e-9))
  }

  test("DittoLite learns a useful classifier on D2") {
    val prf = DittoLite.evaluate(ds, epochs = 200)
    assert(prf.f1 > 0.5, s"f1=${prf.f1}")
  }

  test("Table7 runs end to end on a scaled D2") {
    val rows = Table7.run(spark, scale = 0.15, datasets = Seq("D2"))
    assert(rows.size == 1)
    val r = rows.head
    assert(r.umc > 0.5, s"umc=${r.umc}")
    assert(r.umc >= r.zeroEr - 0.05, s"zeroEr=${r.zeroEr} beat umc=${r.umc} badly")
    assert(Table7.models.map(_._1).contains(r.umcModel))
  }
}
