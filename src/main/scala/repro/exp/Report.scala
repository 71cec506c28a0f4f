package repro.exp

import java.nio.file.{Files, Paths, StandardOpenOption}
import repro.sim.WeightType

/** Renders and persists the reproduced tables as markdown. */
object Report {

  /** All tables (except Table 7, which runs its own experiment) as
    * (name, markdown) pairs.
    */
  def buildAll(res: ExperimentResults): Seq[(String, String)] = {
    val t6 = WeightType.all.map(wt =>
      s"table6-${wt.code}" ->
        Tables.renderMarkdown(s"Table 6 — mean run-time (ms) — ${wt.label} inputs",
          Tables.table6(res, wt)))
    val t8 = WeightType.all.map(wt =>
      s"table8-${wt.code}" ->
        Tables.renderMarkdown(s"Table 8 — optimal-threshold distribution — ${wt.label} inputs",
          Tables.table8(res, wt)))
    val t9 = WeightType.all.map(wt =>
      s"table9-${wt.code}" ->
        Tables.renderMarkdown(s"Table 9 — average optimal threshold — ${wt.label} inputs",
          Tables.table9(res, wt)))
    Seq(
      "table1" -> Tables.renderMarkdown("Table 1 — configuration parameters", Tables.table1),
      "table2" -> Tables.renderMarkdown("Table 2 — dataset characteristics", Tables.table2(res)),
      "table3" -> Tables.renderMarkdown("Table 3 — similarity graphs per dataset and type", Tables.table3(res)),
      "table4" -> Tables.renderMarkdown("Table 4 — macro-average performance", Tables.table4(res)),
      "table5" -> Tables.renderMarkdown("Table 5 — #Top1 / Delta / #Top2 per category", Tables.table5(res)),
    ) ++ t6 ++ t8 ++ t9 :+
      ("ranks" -> ranksMarkdown(res))
  }

  /** Mean-rank orderings (the paper's Nemenyi-diagram content). */
  def ranksMarkdown(res: ExperimentResults): String = {
    def fmt(m: Map[String, Double]): String =
      m.toSeq.sortBy(_._2).map { case (a, r) => f"$a (MR=$r%.2f)" }.mkString(", ")
    s"""### Mean ranks across all graphs (1 = best)
       |
       |- F-Measure: ${fmt(Tables.meanRanks(res, _.f1))}
       |- Precision: ${fmt(Tables.meanRanks(res, _.precision))}
       |- Recall:    ${fmt(Tables.meanRanks(res, _.recall))}
       |""".stripMargin
  }

  /** Write every table under `dir` (created if missing). */
  def writeAll(res: ExperimentResults, dir: String): Unit = {
    val d = Paths.get(dir)
    Files.createDirectories(d)
    for ((name, md) <- buildAll(res)) {
      Files.write(d.resolve(s"$name.md"), md.getBytes("UTF-8"),
        StandardOpenOption.CREATE, StandardOpenOption.TRUNCATE_EXISTING)
    }
  }

  /** Render Table 7 rows (paper numbers are recorded in EXPERIMENTS.md). */
  def table7Markdown(rows: Seq[repro.baselines.Table7.Row]): String = {
    val sb = new StringBuilder
    sb.append("### Table 7 — comparison to state-of-the-art matching methods\n\n")
    sb.append("| Dataset | ZeroER-lite | DittoLite | UMC (SA TF-IDF cosine) | UMC config |\n")
    sb.append("| --- | --- | --- | --- | --- |\n")
    rows.foreach { r =>
      sb.append(f"| ${r.dataset} | ${r.zeroEr}%.2f | ${r.ditto}%.2f | ${r.umc}%.2f " +
        f"| ${r.umcModel}, t=${r.umcT}%.2f |\n")
    }
    sb.toString()
  }
}
