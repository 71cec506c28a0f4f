package repro.dist

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** Distributed Exact Clustering (EXC): mutual-best matching as window
  * argmax on both sides of the edge list, joined back on equality.
  * Tie-breaking matches the canonical (w desc, src asc, dst asc) order
  * of [[repro.core.Exc]].
  */
object DistExc {

  /** @return DataFrame (src, dst) of mutually-best pairs above t. */
  def run(edges: DataFrame, t: Double): DataFrame = {
    val pruned = DistGraph.prune(edges, t, strict = true)
    val bySrc = Window.partitionBy("src").orderBy(col("w").desc, col("src").asc, col("dst").asc)
    val byDst = Window.partitionBy("dst").orderBy(col("w").desc, col("src").asc, col("dst").asc)
    pruned
      .withColumn("rs", row_number().over(bySrc))
      .withColumn("rd", row_number().over(byDst))
      .filter(col("rs") === 1 && col("rd") === 1)
      .select("src", "dst")
  }
}
