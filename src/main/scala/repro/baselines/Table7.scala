package repro.baselines

import org.apache.spark.sql.SparkSession
import repro.core.{Evaluation, Matchers, ThresholdSweep}
import repro.data.{CcerGenerator, DatasetSpec}
import repro.sim.SimFunctions

/** The Table 7 experiment: bipartite matching (UMC over schema-agnostic
  * TF-IDF cosine weights, best n-gram model and threshold per dataset)
  * versus the unsupervised ZeroER-lite and the supervised DittoLite,
  * on D2–D5 as in the paper.
  */
object Table7 {

  /** One result row. */
  final case class Row(
      dataset: String,
      zeroEr: Double,
      ditto: Double,
      umc: Double,
      umcModel: String,
      umcT: Double,
  )

  /** The six candidate representation models of the UMC configuration. */
  val models: Seq[(String, Int, Boolean)] = Seq(
    ("character bi-grams", 2, true),
    ("character tri-grams", 3, true),
    ("character four-grams", 4, true),
    ("token uni-grams", 1, false),
    ("token bi-grams", 2, false),
    ("token tri-grams", 3, false),
  )

  def run(spark: SparkSession, scale: Double = 1.0, datasets: Seq[String] = Seq("D2", "D3", "D4", "D5")): Seq[Row] = {
    datasets.map { id =>
      val ds = CcerGenerator.generate(DatasetSpec.byId(id), scale)
      val gt = new Evaluation.GroundTruth(ds.groundTruth)

      // UMC: best (model, t) by F1; ZeroER-lite runs on the same graph.
      val perModel = models.map { case (name, n, char) =>
        val g = SimFunctions.saTfIdfCosine(spark, ds, n, char).minMaxNormalized
        val sweep = ThresholdSweep.sweep(Matchers.umc, g, gt, timedReps = 0)
        (name, g, sweep)
      }
      val (bestName, bestGraph, bestSweep) = perModel.maxBy(_._3.f1)

      val zeroEr = ZeroErLite.evaluateTopK(bestGraph, gt).f1
      val ditto = DittoLite.evaluate(ds).f1
      Row(id, zeroEr, ditto, bestSweep.f1, bestName, bestSweep.bestT)
    }
  }
}
