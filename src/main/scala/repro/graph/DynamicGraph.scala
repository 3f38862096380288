package repro.graph

import scala.collection.mutable.ArrayBuffer

/** A single edge update: insertion (`add = true`) or deletion, with weight
  * and label, per the paper's δE = [(u, v, label, weight, +/-)] (§3.1).
  * Weight updates appear as one deletion and one insertion.
  */
final case class EdgeUpdate(src: Int, dst: Int, weight: Int, label: Byte, add: Boolean)

/** A directed edge endpoint stored in an adjacency list. */
final case class Half(other: Int, weight: Int, label: Byte)

/** Mutable directed property graph with both out- and in-adjacency,
  * supporting edge insertion/deletion — the base collection E of the IFE
  * dataflow. Vertex set is fixed up front ([0, numVertices)); vertices
  * "appear" through their first edge, as in the paper (§3.1: vertex
  * insertions happen implicitly through edge insertions).
  *
  * Unweighted graphs use weight 1 (§3.1); unlabeled graphs use label 0.
  */
final class DynamicGraph(val numVertices: Int) {
  private val outAdj: Array[ArrayBuffer[Half]] = Array.fill(numVertices)(new ArrayBuffer[Half](2))
  private val inAdj: Array[ArrayBuffer[Half]] = Array.fill(numVertices)(new ArrayBuffer[Half](2))
  private var nEdges: Long = 0L

  def numEdges: Long = nEdges

  def outEdges(v: Int): scala.collection.Seq[Half] = outAdj(v)
  def inEdges(v: Int): scala.collection.Seq[Half] = inAdj(v)
  def outDegree(v: Int): Int = outAdj(v).size
  def inDegree(v: Int): Int = inAdj(v).size
  /** Total degree (in + out), used by the Degree drop policy. */
  def degree(v: Int): Int = outAdj(v).size + inAdj(v).size

  /** Insert edge (src → dst). Parallel edges are allowed (as in SNAP data
    * ingested edge-by-edge); an exact-duplicate insert adds a parallel edge.
    */
  def addEdge(src: Int, dst: Int, weight: Int = 1, label: Byte = 0): Unit = {
    outAdj(src) += Half(dst, weight, label)
    inAdj(dst) += Half(src, weight, label)
    nEdges += 1
  }

  /** Delete one edge matching (src, dst, weight, label) exactly.
    * @return true if an edge was removed
    */
  def removeEdge(src: Int, dst: Int, weight: Int = 1, label: Byte = 0): Boolean = {
    val o = outAdj(src)
    val idx = o.indexWhere(h => h.other == dst && h.weight == weight && h.label == label)
    if (idx < 0) return false
    o.remove(idx)
    val i = inAdj(dst)
    val idx2 = i.indexWhere(h => h.other == src && h.weight == weight && h.label == label)
    i.remove(idx2)
    nEdges -= 1
    true
  }

  /** Apply a batch of updates in order. */
  def apply(batch: Seq[EdgeUpdate]): Unit = batch.foreach { u =>
    if (u.add) addEdge(u.src, u.dst, u.weight, u.label)
    else removeEdge(u.src, u.dst, u.weight, u.label)
  }

  /** All current edges as update-tuples (for export to DataFrames/oracles). */
  def edgeList: Seq[(Int, Int, Int, Byte)] =
    (0 until numVertices).flatMap(v => outAdj(v).map(h => (v, h.other, h.weight, h.label)))

  /** Deep copy (used to hand a private graph to each concurrent query). */
  def copy(): DynamicGraph = {
    val g = new DynamicGraph(numVertices)
    var v = 0
    while (v < numVertices) {
      outAdj(v).foreach(h => g.addEdge(v, h.other, h.weight, h.label))
      v += 1
    }
    g
  }

  /** Degree value at the given percentile in [0, 100] (for τ_max). */
  def degreePercentile(pct: Double): Int = {
    val degs = (0 until numVertices).map(degree).sorted
    if (degs.isEmpty) 0
    else degs(math.min(degs.size - 1, math.max(0, (pct / 100.0 * degs.size).toInt)))
  }
}

object DynamicGraph {
  /** Build a graph over [0, numVertices) from an edge list. */
  def fromEdges(numVertices: Int, edges: Seq[(Int, Int, Int, Byte)]): DynamicGraph = {
    val g = new DynamicGraph(numVertices)
    edges.foreach { case (s, d, w, l) => g.addEdge(s, d, w, l) }
    g
  }
}
