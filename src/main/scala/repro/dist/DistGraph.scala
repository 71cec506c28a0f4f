package repro.dist

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.SimGraph

/** Similarity graphs as Spark DataFrames of edges `(src, dst, w)` —
  * the distributed-dataflow representation used by the `repro.dist`
  * matchers (matching as transformations over edge lists).
  */
object DistGraph {

  /** Lift an in-memory graph to a DataFrame. */
  def fromSimGraph(spark: SparkSession, g: SimGraph): DataFrame = {
    import spark.implicits._
    g.src.indices.map(e => (g.src(e), g.dst(e), g.w(e))).toDF("src", "dst", "w")
  }

  /** Min-max normalize the weight column (constant weights → 1.0), the
    * Catalyst counterpart of [[SimGraph.minMaxNormalized]].
    */
  def minMaxNormalize(edges: DataFrame): DataFrame = {
    val row = edges.agg(min("w") as "lo", max("w") as "hi").head()
    if (row.isNullAt(0)) return edges
    val lo = row.getDouble(0); val hi = row.getDouble(1)
    if (hi <= lo) edges.withColumn("w", lit(1.0))
    else edges.withColumn("w", (col("w") - lit(lo)) / lit(hi - lo))
  }

  /** Drop edges at or below the threshold (strict, the matchers' rule)
    * or strictly below it (CNC's rule) depending on `strict`.
    */
  def prune(edges: DataFrame, t: Double, strict: Boolean = true): DataFrame =
    if (strict) edges.filter(col("w") > t) else edges.filter(col("w") >= t)

  /** Collect a pair DataFrame `(src, dst)` into a deterministic set. */
  def collectPairs(pairs: DataFrame): Set[(Int, Int)] =
    pairs.select(col("src").cast("int"), col("dst").cast("int"))
      .collect()
      .map(r => (r.getInt(0), r.getInt(1)))
      .toSet
}
