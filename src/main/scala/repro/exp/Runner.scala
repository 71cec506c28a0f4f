package repro.exp

import java.util.concurrent.{ArrayBlockingQueue, ThreadPoolExecutor, TimeUnit}
import org.apache.spark.sql.SparkSession
import repro.core.{Evaluation, SimGraph, ThresholdSweep}
import repro.data.{CcerDataset, CcerGenerator, DatasetSpec}
import repro.sim.{GraphMeta, SimConfig, SimFunctions, WeightType}

/** Sweep outcome of one algorithm on one graph. */
final case class AlgOutcome(
    bestT: Double,
    precision: Double,
    recall: Double,
    f1: Double,
    runtimeMs: Double,
)

/** All results for one similarity graph. */
final case class GraphResult(
    meta: GraphMeta,
    m: Int,
    cartesian: Long,
    outcomes: Map[String, AlgOutcome],
) {
  /** Normalized graph size: |E| / |V1 × V2| (paper's threshold analysis). */
  def normalizedSize: Double = m.toDouble / cartesian
}

/** The whole experiment: datasets + per-graph sweep results. */
final case class ExperimentResults(
    datasets: Seq[CcerDataset],
    graphs: Seq[GraphResult],
) {
  def forType(wt: WeightType): Seq[GraphResult] = graphs.filter(_.meta.weightType == wt)
  def dataset(id: String): CcerDataset = datasets.find(_.spec.id == id).get
}

/** Experiment configuration.
  *
  * @param scale     linear size factor over the DatasetSpec sizes
  * @param simCfg    which slices of the similarity-function taxonomy to run
  * @param timedReps timed repetitions at the optimal threshold (paper: 10)
  * @param clean     apply the paper's noise-cleaning rules
  * @param datasets  dataset ids to include
  */
final case class RunConfig(
    scale: Double = 1.0,
    simCfg: SimConfig = SimConfig(),
    timedReps: Int = 10,
    clean: Boolean = true,
    datasets: Seq[String] = DatasetSpec.all.map(_.id),
)

/** Orchestrates the full experiment: generate datasets, build every
  * similarity graph through the Spark pipeline, normalize weights,
  * sweep every algorithm over the threshold grid, and apply the paper's
  * result-cleaning rules (§5).
  *
  * Graph construction (Spark jobs) and threshold sweeps (pure CPU) are
  * overlapped: each finished graph is handed to a bounded sweep pool
  * while the next family's Spark pass runs.
  */
object Runner {

  def runAll(spark: SparkSession, cfg: RunConfig): ExperimentResults = {
    val perDataset = cfg.datasets.map { id =>
      val t0 = System.nanoTime()
      val out = runDataset(spark, DatasetSpec.byId(id), cfg)
      Console.err.println(
        f"[Runner] $id: ${out._2.size} graphs kept in ${(System.nanoTime() - t0) / 1e9}%.1f s")
      out
    }
    ExperimentResults(perDataset.map(_._1), perDataset.flatMap(_._2))
  }

  def runDataset(
      spark: SparkSession,
      spec: DatasetSpec,
      cfg: RunConfig,
  ): (CcerDataset, Seq[GraphResult]) = {
    val ds = CcerGenerator.generate(spec, cfg.scale)
    val gt = new Evaluation.GroundTruth(ds.groundTruth)
    val cartesian = ds.profiles1.length.toLong * ds.profiles2.length

    val pool = new ThreadPoolExecutor(
      math.max(2, Runtime.getRuntime.availableProcessors() - 2),
      math.max(2, Runtime.getRuntime.availableProcessors() - 2),
      1L, TimeUnit.MINUTES,
      new ArrayBlockingQueue[Runnable](16),
      new ThreadPoolExecutor.CallerRunsPolicy,
    )
    val results = new java.util.concurrent.ConcurrentLinkedQueue[GraphResult]()

    SimFunctions.forEachGraph(spark, ds, cfg.simCfg) { (meta, raw) =>
      pool.execute { () =>
        val g = raw.minMaxNormalized
        val outcomes = ThresholdSweep.sweepAll(g, gt, cfg.timedReps).map {
          case (code, o) => code -> AlgOutcome(o.bestT, o.prf.precision, o.prf.recall, o.f1, o.runtimeMs)
        }
        results.add(GraphResult(meta, g.m, cartesian, outcomes))
      }
    }
    pool.shutdown()
    pool.awaitTermination(2, TimeUnit.HOURS)

    import scala.jdk.CollectionConverters._
    val all = results.iterator().asScala.toSeq
      .sortBy(r => (r.meta.weightType.code, r.meta.function))
    val kept = if (cfg.clean) clean(all, ds, gt) else all
    (ds, kept)
  }

  /** The paper's three cleaning rules (§5): graphs whose ground-truth
    * pairs all have zero weight are detected as zero recall at the most
    * permissive threshold for every algorithm; noisy graphs have F1 <
    * 0.25 for every algorithm; near-duplicate graphs share the dataset,
    * edge count, and (for ≥2 algorithms) the optimal threshold with
    * effectiveness within 0.2%.
    */
  def clean(
      graphs: Seq[GraphResult],
      ds: CcerDataset,
      gt: Evaluation.GroundTruth,
  ): Seq[GraphResult] = {
    val informative = graphs.filterNot { g =>
      g.outcomes.values.forall(o => o.recall == 0.0) ||
        g.outcomes.values.forall(_.f1 < 0.25)
    }
    // Near-duplicate removal: first graph of each equivalence bucket wins.
    val kept = scala.collection.mutable.ArrayBuffer[GraphResult]()
    for (g <- informative) {
      val dup = kept.exists { h =>
        h.meta.dataset == g.meta.dataset && h.m == g.m && {
          val agreeing = g.outcomes.count { case (code, o) =>
            val ho = h.outcomes(code)
            ho.bestT == o.bestT &&
              math.abs(ho.f1 - o.f1) < 0.002 &&
              (math.abs(ho.precision - o.precision) < 0.002 ||
                math.abs(ho.recall - o.recall) < 0.002)
          }
          agreeing >= 2
        }
      }
      if (!dup) kept += g
    }
    kept.toSeq
  }
}
