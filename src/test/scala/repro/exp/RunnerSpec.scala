package repro.exp

import repro.SparkSpec
import repro.data.DatasetSpec
import repro.sim.{SASyn, SBSyn, SimConfig, WeightType}

class RunnerSpec extends SparkSpec {

  private val tinyCfg = RunConfig(
    scale = 0.12,
    simCfg = SimConfig(charNs = Seq(3), tokenNs = Seq(1)),
    timedReps = 1,
    clean = false,
    datasets = Seq("D1"),
  )

  private lazy val res = Runner.runAll(spark, tinyCfg)

  test("runAll produces results for every generated graph") {
    // D1 has 2 key attrs: 32 SBSyn + 20 SASyn + 12 SBSem + 6 SASem = 70.
    assert(res.graphs.size == 70)
    assert(res.datasets.size == 1)
  }

  test("every graph carries all eight algorithm outcomes") {
    for (g <- res.graphs) {
      assert(g.outcomes.keySet == Set("CNC", "RSR", "RCA", "BAH", "BMC", "EXC", "KRC", "UMC"))
      for ((_, o) <- g.outcomes) {
        assert(o.f1 >= 0.0 && o.f1 <= 1.0)
        assert(o.bestT >= 0.05 && o.bestT <= 1.0)
      }
    }
  }

  test("normalized size is within (0, 1]") {
    assert(res.graphs.forall(g => g.normalizedSize > 0 && g.normalizedSize <= 1.0))
  }

  test("schema-based syntactic weights on D1 names/phones reach high F1") {
    // The paper's D1 story (Figure 5): clean names and phones make
    // schema-based syntactic inputs highly effective.
    val best = res.forType(SBSyn).flatMap(_.outcomes.values.map(_.f1)).max
    assert(best > 0.8, s"best SBSyn F1 on D1 was $best")
  }

  test("cleaning removes graphs where every algorithm fails") {
    val cleaned = Runner.runDataset(spark, DatasetSpec.byId("D1"), tinyCfg.copy(clean = true))._2
    assert(cleaned.size <= res.graphs.size)
    assert(cleaned.forall(g => g.outcomes.values.exists(_.f1 >= 0.25)))
  }

  test("results are grouped correctly by weight type") {
    val byType = WeightType.all.map(wt => wt -> res.forType(wt).size).toMap
    assert(byType(SBSyn) == 32)
    assert(byType(SASyn) == 20)
    assert(byType.values.sum == res.graphs.size)
  }
}
