package repro.dist

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** Distributed Unique Mapping Clustering (UMC) via iterative
  * locally-dominant edge selection.
  *
  * Edges are ranked once by the canonical (w desc, src asc, dst asc)
  * total order. Each round selects every remaining edge that is the
  * minimum-rank edge of *both* its endpoints (a locally dominant edge),
  * then removes all edges touching the matched nodes. Under a strict
  * total order this yields exactly the sequential greedy matching of
  * [[repro.core.Umc]] — the classic Preis-style parallelization — in
  * O(log m) expected rounds.
  */
object DistUmc {

  /** @return DataFrame (src, dst) of the greedy matching above t. */
  def run(spark: SparkSession, edges: DataFrame, t: Double, maxIter: Int = 100): DataFrame = {
    import spark.implicits._
    val order = Window.orderBy(col("w").desc, col("src").asc, col("dst").asc)
    var remaining = DistGraph.prune(edges, t, strict = true)
      .withColumn("rank", row_number().over(order))
      .select("src", "dst", "rank")
      .cache()

    var matched = spark.emptyDataset[(Int, Int)].toDF("src", "dst")
    var iter = 0
    var done = remaining.isEmpty
    while (!done && iter < maxIter) {
      val minBySrc = remaining.groupBy("src").agg(min("rank") as "ms")
      val minByDst = remaining.groupBy("dst").agg(min("rank") as "md")
      val dominant = remaining
        .join(minBySrc, Seq("src"))
        .join(minByDst, Seq("dst"))
        .filter(col("rank") === col("ms") && col("rank") === col("md"))
        .select("src", "dst")
        .cache()
      dominant.count()
      matched = matched.union(dominant)
      val nextRemaining = remaining
        .join(dominant.select(col("src") as "msrc"), col("src") === col("msrc"), "left_anti")
        .join(dominant.select(col("dst") as "mdst"), col("dst") === col("mdst"), "left_anti")
        .cache()
      done = nextRemaining.isEmpty
      remaining.unpersist()
      remaining = nextRemaining
      iter += 1
    }
    require(done, s"dominant-edge selection did not drain in $maxIter rounds")
    remaining.unpersist()
    matched
  }
}
