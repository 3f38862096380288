package repro.spark

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.graph.{DynamicGraph, EdgeUpdate}

/** Distribute a fleet of concurrent continuous queries over the Spark
  * cluster. The paper's scalability axis (Table 1, Fig 7) is "how many
  * concurrently-maintained queries fit"; the queries are independent, so a
  * GDBMS embedded in Spark parallelizes them as tasks: the (broadcast)
  * graph + update stream is shared, each task owns one query's
  * differential state.
  */
object QueryFleet {

  /** Per-query outcome: source, time, differential memory, checksum of the
    * final states (for cross-checking against a local run).
    */
  final case class QueryResult(source: Int, initialMs: Double, batchesMs: Double,
                               memBytes: Long, storedDiffs: Long, checksum: Double)

  /** Maintain one JOD SSSP/K-hop query per source, across the cluster.
    *
    * @param mkSpec  (graph, source) => spec, executed on executors
    * @param dropP   dropping probability (0 = plain JOD); Degree policy
    * @param useProb Prob-Drop (Bloom) instead of Det-Drop
    */
  def run(spark: SparkSession,
          numVertices: Int,
          initial: Seq[(Int, Int, Int, Byte)],
          batches: Seq[Seq[EdgeUpdate]],
          sources: Seq[Int],
          mkSpec: (DynamicGraph, Int) => IFESpec,
          dropP: Double = 0.0,
          useProb: Boolean = false): Seq[QueryResult] = {
    val sc = spark.sparkContext
    val bInitial = sc.broadcast(initial.toArray)
    val bBatches = sc.broadcast(batches.map(_.toArray).toArray)
    sc.parallelize(sources, math.min(sources.size, sc.defaultParallelism))
      .map { source =>
        val g = DynamicGraph.fromEdges(numVertices, bInitial.value.toSeq)
        val spec = mkSpec(g, source)
        val tauMax = g.degreePercentile(80)
        val (policy, vt) =
          if (dropP <= 0) (DropPolicy.KeepAll, null)
          else if (useProb)
            (DropPolicy.Degree(dropP, 2, tauMax): DropPolicy, new ProbDroppedVT(8192): DroppedVT)
          else (DropPolicy.Degree(dropP, 2, tauMax): DropPolicy, new DetDroppedVT: DroppedVT)
        val engine = new Jod(spec, policy, vt)
        val t0 = System.nanoTime()
        engine.initialRun()
        val t1 = System.nanoTime()
        bBatches.value.foreach(b => engine.applyBatch(b.toSeq))
        val t2 = System.nanoTime()
        val states = engine.currentStates()
        var checksum = 0.0
        var i = 0
        while (i < states.length) {
          if (!states(i).isInfinite) checksum += states(i) * (i % 97 + 1)
          i += 1
        }
        QueryResult(source, (t1 - t0) / 1e6, (t2 - t1) / 1e6,
          engine.memoryBytes, engine.storedDiffCount, checksum)
      }
      .collect()
      .toSeq
  }
}
