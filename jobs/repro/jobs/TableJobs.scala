package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp.{ExperimentStore, Report, Tables}
import repro.sim.WeightType

/** Shared session/bootstrap for the spark-submit entrypoints. */
object JobSession {
  def spark(): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("repro-jobs")
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  def outDir(args: Array[String]): String =
    args.headOption.getOrElse("results")
}

/** Run the full experiment and write every table. */
object RunExperiment {
  def main(args: Array[String]): Unit = {
    val s = JobSession.spark()
    val res = ExperimentStore.results(s)
    Report.writeAll(res, JobSession.outDir(args))
    println(s"wrote ${Report.buildAll(res).size} tables to ${JobSession.outDir(args)}")
    s.stop()
  }
}

/** Run a single dataset end to end (graphs + sweeps) and print a
  * summary — useful for calibration and debugging.
  * Args: dataset id (default D1), scale (default REPRO_SCALE).
  */
object RunDatasetJob {
  def main(args: Array[String]): Unit = {
    val s = JobSession.spark()
    val id = args.headOption.getOrElse("D1")
    val scale = args.lift(1).map(_.toDouble).getOrElse(ExperimentStore.scale)
    val t0 = System.nanoTime()
    val (ds, graphs) = repro.exp.Runner.runDataset(
      s, repro.data.DatasetSpec.byId(id), repro.exp.RunConfig(scale = scale))
    val secs = (System.nanoTime() - t0) / 1e9
    println(f"$id scale=$scale: |V1|=${ds.profiles1.size} |V2|=${ds.profiles2.size} " +
      f"dups=${ds.groundTruth.size} graphs=${graphs.size} in $secs%.1f s")
    for (wt <- WeightType.all) {
      val gs = graphs.filter(_.meta.weightType == wt)
      if (gs.nonEmpty) {
        val byAlg = repro.exp.Tables.algs.map { a =>
          f"$a=${gs.map(_.outcomes(a).f1).sum / gs.size}%.3f"
        }
        println(s"  ${wt.code}: |G|=${gs.size} avgE=${gs.map(_.m).sum / gs.size} " +
          s"meanF1{${byAlg.mkString(" ")}}")
      }
    }
    s.stop()
  }
}

/** One job per paper table; each prints its table and exits. */
object Table1Job {
  def main(args: Array[String]): Unit =
    println(Tables.renderMarkdown("Table 1", Tables.table1))
}

object Table2Job {
  def main(args: Array[String]): Unit = {
    val s = JobSession.spark()
    println(Tables.renderMarkdown("Table 2", Tables.table2(ExperimentStore.results(s))))
    s.stop()
  }
}

object Table3Job {
  def main(args: Array[String]): Unit = {
    val s = JobSession.spark()
    println(Tables.renderMarkdown("Table 3", Tables.table3(ExperimentStore.results(s))))
    s.stop()
  }
}

object Table4Job {
  def main(args: Array[String]): Unit = {
    val s = JobSession.spark()
    val res = ExperimentStore.results(s)
    println(Tables.renderMarkdown("Table 4", Tables.table4(res)))
    println(Report.ranksMarkdown(res))
    s.stop()
  }
}

object Table5Job {
  def main(args: Array[String]): Unit = {
    val s = JobSession.spark()
    println(Tables.renderMarkdown("Table 5", Tables.table5(ExperimentStore.results(s))))
    s.stop()
  }
}

object Table6Job {
  def main(args: Array[String]): Unit = {
    val s = JobSession.spark()
    val res = ExperimentStore.results(s)
    WeightType.all.foreach(wt =>
      println(Tables.renderMarkdown(s"Table 6 (${wt.label})", Tables.table6(res, wt))))
    s.stop()
  }
}

object Table7Job {
  def main(args: Array[String]): Unit = {
    val s = JobSession.spark()
    val rows = repro.baselines.Table7.run(s, ExperimentStore.scale)
    println(Report.table7Markdown(rows))
    s.stop()
  }
}

object Table8Job {
  def main(args: Array[String]): Unit = {
    val s = JobSession.spark()
    val res = ExperimentStore.results(s)
    WeightType.all.foreach(wt =>
      println(Tables.renderMarkdown(s"Table 8 (${wt.label})", Tables.table8(res, wt))))
    s.stop()
  }
}

object Table9Job {
  def main(args: Array[String]): Unit = {
    val s = JobSession.spark()
    val res = ExperimentStore.results(s)
    WeightType.all.foreach(wt =>
      println(Tables.renderMarkdown(s"Table 9 (${wt.label})", Tables.table9(res, wt))))
    s.stop()
  }
}
