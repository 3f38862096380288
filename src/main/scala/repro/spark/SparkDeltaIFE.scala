package repro.spark

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Distributed incremental maintenance of min-IFE results on DataFrames —
  * the Spark-native counterpart of differential maintenance for the
  * monotone (insert-only) case: instead of recomputing from scratch, new
  * edges seed a delta frontier that is relaxed until quiescent, touching
  * only the affected neighbourhood (DC's localization property, §3.3).
  *
  * Deletions require state *raises* which a monotone DataFrame loop cannot
  * express incrementally; those run through the local JOD/VDC engines
  * (see DESIGN.md).
  */
object SparkDeltaIFE {

  /** Maintain SSSP distances after inserting `newEdges` into `edges`
    * (both (src, dst, weight)); `prev` is the previous (v, dist) result.
    * Returns the updated (v, dist).
    */
  def maintainSssp(spark: SparkSession, edges: DataFrame, newEdges: DataFrame,
                   prev: DataFrame, maxIters: Int = 10000): DataFrame = {
    var dist = prev.localCheckpoint(true)
    // Seed: relax only the inserted edges from the previous solution.
    var frontier = newEdges
      .join(dist, newEdges("src") === dist("v"))
      .select(newEdges("dst") as "v", (dist("dist") + newEdges("weight")) as "dist")
      .localCheckpoint(true)
    var i = 0
    var done = frontier.isEmpty
    while (!done && i < maxIters) {
      i += 1
      val improved = frontier
        .groupBy("v").agg(min("dist") as "dist")
        .join(dist.withColumnRenamed("dist", "old"), Seq("v"), "left_outer")
        .where(col("old").isNull || col("dist") < col("old"))
        .select(col("v"), col("dist"))
        .localCheckpoint(true)
      if (improved.isEmpty) done = true
      else {
        dist = dist.unionByName(improved)
          .groupBy("v").agg(min("dist") as "dist")
          .localCheckpoint(true)
        frontier = improved
          .join(edges, improved("v") === edges("src"))
          .select(edges("dst") as "v", (improved("dist") + edges("weight")) as "dist")
          .localCheckpoint(true)
      }
    }
    dist
  }
}
