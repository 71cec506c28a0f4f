package repro.exp

import repro.SparkSpec
import repro.data.{CcerGenerator, DatasetSpec}
import repro.sim.{GraphMeta, SASyn, SBSyn}

class TablesSpec extends SparkSpec {

  // A miniature hand-built experiment: two datasets, four graphs.
  private def outcome(f1: Double, t: Double = 0.5) =
    AlgOutcome(bestT = t, precision = f1, recall = f1, f1 = f1, runtimeMs = 1.0)

  private def outcomes(base: Double): Map[String, AlgOutcome] =
    Tables.algs.zipWithIndex.map { case (a, i) =>
      a -> outcome(math.max(0.0, base - i * 0.05))
    }.toMap

  private lazy val res = ExperimentResults(
    datasets = Seq(
      CcerGenerator.generate(DatasetSpec.byId("D1"), 0.05),
      CcerGenerator.generate(DatasetSpec.byId("D2"), 0.05),
    ),
    graphs = Seq(
      GraphResult(GraphMeta("D1", SBSyn, "name:jaro"), m = 100, cartesian = 1000, outcomes(0.9)),
      GraphResult(GraphMeta("D1", SASyn, "char3-vec:cosine-tf"), m = 400, cartesian = 1000, outcomes(0.8)),
      GraphResult(GraphMeta("D2", SBSyn, "name:jaro"), m = 150, cartesian = 900, outcomes(0.7)),
      GraphResult(GraphMeta("D2", SASyn, "char3-vec:cosine-tf"), m = 500, cartesian = 900, outcomes(0.6)),
    ),
  )

  test("table1 lists all eight algorithms with threshold support") {
    val (h, rows) = Tables.table1
    assert(h.size == 3)
    assert(rows.size == 8)
    assert(rows.forall(_(1) == "yes"))
  }

  test("table2 has one column per dataset and the size rows") {
    val (h, rows) = Tables.table2(res)
    assert(h == Seq("", "D1", "D2"))
    assert(rows.exists(_.head == "|V1|"))
    assert(rows.find(_.head == "Category").get.tail == Seq("SCR", "BLC"))
  }

  test("table3 counts graphs per dataset and type") {
    val (_, rows) = Tables.table3(res)
    val d1 = rows.find(_.head == "D1").get
    assert(d1(1) == "1") // one SBSyn graph
    val sums = rows.find(_.head == "Sum |G|").get
    assert(sums(1) == "2") // two SBSyn graphs overall
  }

  test("table4 averages per algorithm in registry order") {
    val (_, rows) = Tables.table4(res)
    assert(rows.map(_.head) == Tables.algs)
    val cnc = rows.head
    // CNC is first in each synthetic outcome map with base F1s 0.9/0.8/0.7/0.6.
    assert(cnc(5) == "0.750")
  }

  test("table5 counts Top1 for the synthetic winner") {
    val (_, rows) = Tables.table5(res)
    // CNC wins every graph in this synthetic setup (highest base).
    val cncTop1 = rows.find(r => r.head == "CNC" && r(1) == "#Top1").get
    // D1 is scarce, D2 balanced; columns: sb-syn BLC, OSD, SCR, OVL, ...
    assert(cncTop1(2 + 3) == "2") // sb-syn OVL = both SBSyn graphs
  }

  test("table6 reports runtimes for every dataset row") {
    val (_, rows) = Tables.table6(res, SBSyn)
    assert(rows.size == 2)
    assert(rows.forall(_.size == 9))
  }

  test("table8 reports threshold stats within the grid") {
    val (_, rows) = Tables.table8(res, SBSyn)
    assert(rows.size == 8)
    assert(rows.forall(r => r(3) == "0.50" && r(6) == "0.50")) // all thresholds 0.5
  }

  test("table9 reports per-dataset thresholds") {
    val (_, rows) = Tables.table9(res, SASyn)
    assert(rows.size == 2)
    assert(rows.head(1).startsWith("0.50"))
  }

  test("meanRanks puts the synthetic winner first") {
    val ranks = Tables.meanRanks(res, _.f1)
    assert(ranks("CNC") == 1.0)
    assert(ranks("UMC") == 8.0)
  }

  test("renderMarkdown produces a well-formed table") {
    val md = Tables.renderMarkdown("T", (Seq("a", "b"), Seq(Seq("1", "2"))))
    assert(md.contains("### T"))
    assert(md.contains("| a | b |"))
    assert(md.contains("| 1 | 2 |"))
  }
}
