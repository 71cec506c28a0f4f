package repro.exp

import repro.core.Matchers
import repro.data.{Balanced, Category, OneSided, Scarce}
import repro.sim.WeightType

/** Builds the paper's result tables from the collected sweep results.
  * Every builder returns (header, rows) ready for markdown rendering.
  */
object Tables {

  /** Algorithm codes in the paper's presentation order. */
  val algs: Seq[String] = Matchers.all.map(_.code)

  type Table = (Seq[String], Seq[Seq[String]])

  def renderMarkdown(title: String, t: Table): String = {
    val (header, rows) = t
    val sb = new StringBuilder
    sb.append(s"### $title\n\n")
    sb.append(header.mkString("| ", " | ", " |\n"))
    sb.append(header.map(_ => "---").mkString("| ", " | ", " |\n"))
    rows.foreach(r => sb.append(r.mkString("| ", " | ", " |\n")))
    sb.toString()
  }

  private def f3(x: Double): String = if (x.isNaN) "-" else f"$x%.3f"
  private def f2(x: Double): String = if (x.isNaN) "-" else f"$x%.2f"

  // ---------------------------------------------------------- Table 1
  /** Configuration parameters per algorithm. */
  def table1: Table = (
    Seq("Algor.", "Similarity Threshold t", "Other"),
    Matchers.all.map(m => Seq(m.code, "yes", m.extraConfig)),
  )

  // ---------------------------------------------------------- Table 2
  /** Technical characteristics of the generated datasets. */
  def table2(res: ExperimentResults): Table = {
    val ds = res.datasets
    def row(label: String, f: repro.data.CcerDataset => String) =
      label +: ds.map(f)
    (
      Seq("") ++ ds.map(_.spec.id),
      Seq(
        row("Dataset1", _.spec.source1),
        row("Dataset2", _.spec.source2),
        row("|V1|", _.profiles1.length.toString),
        row("|V2|", _.profiles2.length.toString),
        row("|NVP1|", _.nvp(1).toString),
        row("|NVP2|", _.nvp(2).toString),
        row("|A1|", _.spec.attrs.length.toString),
        row("|A2|", _.spec.attrs.length.toString),
        row("|p1|", d => f2(d.avgPairs(1))),
        row("|p2|", d => f2(d.avgPairs(2))),
        row("|D(V1 n V2)|", _.groundTruth.size.toString),
        row("|V1 x V2|", d => (d.profiles1.length.toLong * d.profiles2.length).toString),
        row("Category", _.spec.category.code),
      ),
    )
  }

  // ---------------------------------------------------------- Table 3
  /** Number of similarity graphs and average edges per dataset × type. */
  def table3(res: ExperimentResults): Table = {
    val header = Seq("Dataset") ++ WeightType.all.flatMap(wt =>
      Seq(s"${wt.code} |G|", s"${wt.code} |E|avg", s"${wt.code} %cart"))
    val rows = res.datasets.map { d =>
      val id = d.spec.id
      d.spec.id +: WeightType.all.flatMap { wt =>
        val gs = res.graphs.filter(g => g.meta.dataset == id && g.meta.weightType == wt)
        if (gs.isEmpty) Seq("0", "-", "-")
        else {
          val avgE = Stats.mean(gs.map(_.m.toDouble))
          val pct = 100.0 * Stats.mean(gs.map(_.normalizedSize))
          Seq(gs.size.toString, f"$avgE%.0f", f"$pct%.1f%%")
        }
      }
    }
    val totals = "Sum |G|" +: WeightType.all.flatMap { wt =>
      Seq(res.forType(wt).size.toString, "-", "-")
    }
    (header, rows :+ totals)
  }

  // ---------------------------------------------------------- Table 4
  /** Macro-average precision/recall/F1 (μ, σ) per algorithm. */
  def table4(res: ExperimentResults): Table = {
    val rows = algs.map { a =>
      val os = res.graphs.map(_.outcomes(a))
      Seq(
        a,
        f3(Stats.mean(os.map(_.precision))), f3(Stats.stddev(os.map(_.precision))),
        f3(Stats.mean(os.map(_.recall))), f3(Stats.stddev(os.map(_.recall))),
        f3(Stats.mean(os.map(_.f1))), f3(Stats.stddev(os.map(_.f1))),
      )
    }
    (Seq("", "P mu", "P sigma", "R mu", "R sigma", "F1 mu", "F1 sigma"), rows)
  }

  /** Mean ranks by a measure (the paper's Nemenyi-diagram orderings). */
  def meanRanks(res: ExperimentResults, measure: AlgOutcome => Double): Map[String, Double] =
    Stats.meanRanks(res.graphs.map(g => g.outcomes.map { case (k, o) => k -> measure(o) }))

  // ---------------------------------------------------------- Table 5
  /** #Top1 / Δ(%) / #Top2 per algorithm × weight type × category. */
  def table5(res: ExperimentResults): Table = {
    val cats: Seq[Category] = Seq(Balanced, OneSided, Scarce)
    def datasetCategory(id: String): Category =
      repro.data.DatasetSpec.byId(id).category

    // Per graph: the set of top-1 algorithms, the Δ to the second-best
    // distinct F1, and the set of top-2 algorithms.
    final case class Tops(top1: Set[String], delta: Double, top2: Set[String])
    def tops(g: GraphResult): Tops = {
      val byAlg = g.outcomes.map { case (k, o) => k -> o.f1 }
      val best = byAlg.values.max
      val top1 = byAlg.filter(_._2 == best).keySet
      val below = byAlg.values.filter(_ < best)
      val second = if (below.isEmpty) best else below.max
      val top2 = byAlg.filter(_._2 == second).keySet
      Tops(top1, (best - second) * 100.0, top2)
    }

    val header = Seq("Algorithm", "Measure") ++
      WeightType.all.flatMap(wt => (cats.map(c => s"${wt.code} ${c.code}") :+ s"${wt.code} OVL"))

    val rows = algs.flatMap { a =>
      def cells(stat: String): Seq[String] = WeightType.all.flatMap { wt =>
        val perCat = cats.map { c =>
          val gs = res.forType(wt).filter(g => datasetCategory(g.meta.dataset) == c)
          val ts = gs.map(tops)
          stat match {
            case "#Top1" => ts.count(_.top1.contains(a)).toString
            case "Delta" =>
              val ds = ts.filter(_.top1.contains(a)).map(_.delta)
              if (ds.isEmpty) "-" else f2(Stats.mean(ds))
            case "#Top2" => ts.count(_.top2.contains(a)).toString
          }
        }
        val ovl = {
          val gs = res.forType(wt)
          val ts = gs.map(tops)
          stat match {
            case "#Top1" => ts.count(_.top1.contains(a)).toString
            case "Delta" =>
              val ds = ts.filter(_.top1.contains(a)).map(_.delta)
              if (ds.isEmpty) "-" else f2(Stats.mean(ds))
            case "#Top2" => ts.count(_.top2.contains(a)).toString
          }
        }
        perCat :+ ovl
      }
      Seq(
        a +: "#Top1" +: cells("#Top1"),
        a +: "Delta%" +: cells("Delta"),
        a +: "#Top2" +: cells("#Top2"),
      )
    }
    (header, rows)
  }

  // ---------------------------------------------------------- Table 6
  /** Mean run-time (ms) ± σ per algorithm × dataset, for one type. */
  def table6(res: ExperimentResults, wt: WeightType): Table = {
    val rows = res.datasets.map { d =>
      val gs = res.forType(wt).filter(_.meta.dataset == d.spec.id)
      d.spec.id +: algs.map { a =>
        if (gs.isEmpty) "-"
        else {
          val ts = gs.map(_.outcomes(a).runtimeMs)
          f"${Stats.mean(ts)}%.1f±${Stats.stddev(ts)}%.1f"
        }
      }
    }
    (Seq("Dataset") ++ algs, rows)
  }

  // ---------------------------------------------------------- Table 8
  /** Distribution of optimal thresholds per algorithm, for one type. */
  def table8(res: ExperimentResults, wt: WeightType): Table = {
    val gs = res.forType(wt)
    val rows = algs.map { a =>
      val ts = gs.map(_.outcomes(a).bestT)
      val sizes = gs.map(_.normalizedSize)
      Seq(
        a,
        f"${Stats.mean(ts)}%.2f±${Stats.stddev(ts)}%.2f",
        f2(if (ts.isEmpty) Double.NaN else ts.min),
        f2(Stats.quantile(ts, 0.25)),
        f2(Stats.quantile(ts, 0.50)),
        f2(Stats.quantile(ts, 0.75)),
        f2(if (ts.isEmpty) Double.NaN else ts.max),
        f2(Stats.pearson(ts, sizes)),
      )
    }
    (Seq("", "t mu±sigma", "min", "Q1", "Q2", "Q3", "max", "corr"), rows)
  }

  // ---------------------------------------------------------- Table 9
  /** Average optimal threshold ± σ per algorithm × dataset, one type. */
  def table9(res: ExperimentResults, wt: WeightType): Table = {
    val rows = res.datasets.map { d =>
      val gs = res.forType(wt).filter(_.meta.dataset == d.spec.id)
      d.spec.id +: algs.map { a =>
        if (gs.isEmpty) "-"
        else {
          val ts = gs.map(_.outcomes(a).bestT)
          f"${Stats.mean(ts)}%.2f±${Stats.stddev(ts)}%.2f"
        }
      }
    }
    (Seq("Dataset") ++ algs, rows)
  }
}
