package repro.dist

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Distributed Connected Components (CNC) over an edge DataFrame.
  *
  * Iterative min-label propagation: every node starts labelled with its
  * own global id (V1 node i → i, V2 node j → n1 + j); each round every
  * node adopts the minimum label in its closed neighbourhood, until a
  * fixpoint. Components with exactly two members — necessarily one per
  * side — become the output pairs, exactly like [[repro.core.Cnc]]
  * (which keeps edges with w ≥ t).
  */
object DistCnc {

  /** @return DataFrame (src, dst) of matched pairs. */
  def run(spark: SparkSession, edges: DataFrame, t: Double, n1: Int, maxIter: Int = 50): DataFrame = {
    val pruned = DistGraph.prune(edges, t, strict = false)
      .select(col("src").cast("long") as "a", (col("dst").cast("long") + n1) as "b")
      .cache()

    // Undirected adjacency, both directions.
    val adj = pruned.union(pruned.select(col("b") as "a", col("a") as "b")).cache()

    var labels = adj.select(col("a") as "node").distinct()
      .withColumn("label", col("node"))
      .cache()

    var converged = false
    var iter = 0
    while (!converged && iter < maxIter) {
      val neighborMin = adj
        .join(labels.withColumnRenamed("node", "b2"), col("b") === col("b2"))
        .groupBy(col("a") as "node")
        .agg(min("label") as "nLabel")
      val updated = labels
        .join(neighborMin, Seq("node"), "left")
        .select(col("node"), least(col("label"), coalesce(col("nLabel"), col("label"))) as "label")
        .cache()
      val changed = updated
        .join(labels.withColumnRenamed("label", "old"), Seq("node"))
        .filter(col("label") =!= col("old"))
        .limit(1)
        .count()
      labels.unpersist()
      labels = updated
      converged = changed == 0
      iter += 1
    }
    require(converged, s"label propagation did not converge in $maxIter iterations")

    // Components of exactly two nodes, one per side.
    val comps = labels.groupBy("label").agg(
      count("*") as "sz",
      min("node") as "lo",
      max("node") as "hi",
    )
    val result = comps
      .filter(col("sz") === 2 && col("lo") < n1 && col("hi") >= n1)
      .select(col("lo").cast("int") as "src", (col("hi") - n1).cast("int") as "dst")
    val out = result.cache()
    out.count() // materialize before unpersisting inputs
    pruned.unpersist(); adj.unpersist(); labels.unpersist()
    out
  }
}
