package repro.exp

import java.nio.file.Files
import repro.SparkSpec
import repro.data.{CcerGenerator, DatasetSpec}
import repro.sim.{GraphMeta, SASyn, SBSyn}

class ReportSpec extends SparkSpec {

  private def outcomes(base: Double): Map[String, AlgOutcome] =
    Tables.algs.zipWithIndex.map { case (a, i) =>
      a -> AlgOutcome(0.5, base, base, math.max(0.0, base - i * 0.03), 1.0)
    }.toMap

  private lazy val res = ExperimentResults(
    datasets = Seq(CcerGenerator.generate(DatasetSpec.byId("D1"), 0.05)),
    graphs = Seq(
      GraphResult(GraphMeta("D1", SBSyn, "name:jaro"), 100, 1000, outcomes(0.9)),
      GraphResult(GraphMeta("D1", SASyn, "char3-vec:cosine-tf"), 400, 1000, outcomes(0.8)),
    ),
  )

  test("buildAll produces every expected table") {
    val names = Report.buildAll(res).map(_._1)
    assert(names.contains("table1") && names.contains("table4") && names.contains("table5"))
    assert(names.count(_.startsWith("table6-")) == 4)
    assert(names.count(_.startsWith("table8-")) == 4)
    assert(names.count(_.startsWith("table9-")) == 4)
    assert(names.contains("ranks"))
  }

  test("writeAll persists one markdown file per table") {
    val dir = Files.createTempDirectory("repro-report").toString
    Report.writeAll(res, dir)
    val files = new java.io.File(dir).listFiles().map(_.getName).toSet
    assert(files.contains("table1.md"))
    assert(files.contains("table4.md"))
    assert(Report.buildAll(res).forall { case (n, _) => files.contains(s"$n.md") })
  }

  test("ranksMarkdown lists all three measures") {
    val md = Report.ranksMarkdown(res)
    assert(md.contains("F-Measure") && md.contains("Precision") && md.contains("Recall"))
    assert(md.contains("CNC") && md.contains("UMC"))
  }

  test("table7Markdown renders baseline rows") {
    val md = Report.table7Markdown(Seq(
      repro.baselines.Table7.Row("D2", 0.5, 0.8, 0.9, "character bi-grams", 0.35)))
    assert(md.contains("| D2 | 0.50 | 0.80 | 0.90 | character bi-grams, t=0.35 |"))
  }
}
