package repro.spark

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Static IFE evaluation as iterative Catalyst DataFrame programs — the
  * distributed form of the Scratch baseline. Each IFE iteration is one
  * join-aggregate round: frontier ⋈ edges → candidate states → min-merge,
  * repeated to fixpoint. Lineage is truncated every round with
  * `localCheckpoint` so plans stay bounded.
  *
  * Input edge frames use columns (src, dst, weight, label); results are
  * (v, dist) with `dist` the query's vertex state.
  */
object SparkIFE {
  /** Run min-aggregation IFE: `relax` maps the joined (frontier × edges)
    * round to candidate (v, dist) rows.
    */
  private def minLoop(spark: SparkSession, init: DataFrame,
                      relax: DataFrame => DataFrame, maxIters: Int): DataFrame = {
    var dist = init.localCheckpoint(true)
    var frontier = dist
    var i = 0
    var done = false
    while (!done && i < maxIters) {
      i += 1
      val cand = relax(frontier)
      // improvements: candidates strictly better than the current state
      val improved = cand
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
      }
    }
    dist
  }

  /** SSSP distances from `source` over weighted edges. */
  def sssp(spark: SparkSession, edges: DataFrame, source: Int, maxIters: Int = 10000): DataFrame = {
    import spark.implicits._
    val init = Seq((source, 0.0)).toDF("v", "dist")
    minLoop(spark, init,
      f => f.join(edges, f("v") === edges("src"))
        .select(edges("dst") as "v", (f("dist") + edges("weight")) as "dist"),
      maxIters)
  }

  /** K-hop: vertices within k hops of `source`, with hop distance. */
  def khop(spark: SparkSession, edges: DataFrame, source: Int, k: Int): DataFrame = {
    import spark.implicits._
    val init = Seq((source, 0.0)).toDF("v", "dist")
    minLoop(spark, init,
      f => f.join(edges, f("v") === edges("src"))
        .where(f("dist") + 1 <= k)
        .select(edges("dst") as "v", (f("dist") + lit(1.0)) as "dist"),
      maxIters = k + 1)
  }

  /** WCC: minimum-vertex-id label propagation over the undirected closure.
    * Returns (v, dist) where dist is the component's minimum vertex id.
    */
  def wcc(spark: SparkSession, edges: DataFrame, maxIters: Int = 10000): DataFrame = {
    val sym = edges.select(col("src"), col("dst"))
      .unionByName(edges.select(col("dst") as "src", col("src") as "dst"))
    val init = sym.select(col("src") as "v")
      .unionByName(sym.select(col("dst") as "v"))
      .distinct()
      .select(col("v"), col("v").cast("double") as "dist")
    minLoop(spark, init,
      f => f.join(sym, f("v") === sym("src")).select(sym("dst") as "v", f("dist")),
      maxIters)
  }

  /** RPQ via the product construction: `trans` rows are (q, lbl, nq);
    * returns the distinct base vertices reachable from `source` in an
    * accepting automaton state.
    */
  def rpq(spark: SparkSession, edges: DataFrame, source: Int,
          trans: DataFrame, accepting: Seq[Int], maxIters: Int = 10000): DataFrame = {
    import spark.implicits._
    val nq = 64 // automaton states are tiny; pack node = v * nq + q
    val init = Seq((source * nq, 0.0)).toDF("v", "dist") // start state q0 = 0
    val dist = minLoop(spark, init,
      f => f
        .withColumn("bv", (f("v") / nq).cast("int"))
        .withColumn("q", f("v") % nq)
        .join(edges, col("bv") === edges("src"))
        .join(trans, col("q") === trans("q_from") && edges("label") === trans("lbl"))
        .select((edges("dst") * nq + trans("q_to")) as "v", (f("dist") + lit(1.0)) as "dist"),
      maxIters)
    dist
      .withColumn("q", col("v") % nq)
      .where(col("q").isin(accepting.map(_.toLong): _*))
      .select((col("v") / nq).cast("int") as "v")
      .distinct()
  }
}
