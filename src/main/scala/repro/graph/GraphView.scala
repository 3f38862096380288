package repro.graph

/** A view of a [[DynamicGraph]] as the node space an IFE computation runs
  * over. The engines (Scratch / VDC / JOD) are written against this trait so
  * that the same code evaluates:
  *
  *  - plain directed queries (SPSP, SSSP, K-hop, PageRank) — nodes = vertices;
  *  - undirected queries (WCC) — every edge contributes both directions;
  *  - RPQs — nodes = (vertex, automaton state) product nodes.
  *
  * Views are live: they read the underlying mutable graph, so applying an
  * [[EdgeUpdate]] to the graph updates every view of it.
  */
trait GraphView {
  /** The underlying dynamic graph. */
  def graph: DynamicGraph

  /** Number of nodes in this view's node space. */
  def numNodes: Int

  /** In-edges of a node: (source node, weight, label). */
  def inEdges(node: Int): Iterator[(Int, Int, Byte)]

  /** Out-neighbour nodes (for scheduling direct-rule reruns). */
  def outNodes(node: Int): Iterator[Int]

  /** Out-edges of a node: (destination node, weight, label) — what the Join
    * operator of VDC enumerates when it reruns for a source node.
    */
  def outEdges(node: Int): Iterator[(Int, Int, Byte)]

  /** Degree used by the Degree drop policy for this node. */
  def policyDegree(node: Int): Int

  /** Nodes whose aggregation must be re-seeded (scheduled at iteration 1)
    * when the base edge (u, v, label) is inserted or deleted.
    */
  def touchedDsts(u: Int, v: Int, label: Byte): Iterator[Int]

  /** Nodes whose Join operator must rerun when the base edge (u, v, label)
    * is inserted or deleted (the δE direct rule of VDC is keyed by source).
    */
  def touchedSrcs(u: Int, v: Int, label: Byte): Iterator[Int]

  /** Map a view node back to its base vertex (for reporting results). */
  def baseVertex(node: Int): Int
}

/** Directed view: nodes are exactly the graph's vertices. */
final class DirectView(val graph: DynamicGraph) extends GraphView {
  def numNodes: Int = graph.numVertices
  def inEdges(node: Int): Iterator[(Int, Int, Byte)] =
    graph.inEdges(node).iterator.map(h => (h.other, h.weight, h.label))
  def outNodes(node: Int): Iterator[Int] = graph.outEdges(node).iterator.map(_.other)
  def outEdges(node: Int): Iterator[(Int, Int, Byte)] =
    graph.outEdges(node).iterator.map(h => (h.other, h.weight, h.label))
  def policyDegree(node: Int): Int = graph.degree(node)
  def touchedDsts(u: Int, v: Int, label: Byte): Iterator[Int] = Iterator.single(v)
  def touchedSrcs(u: Int, v: Int, label: Byte): Iterator[Int] = Iterator.single(u)
  def baseVertex(node: Int): Int = node
}

/** Undirected view (for WCC): each stored edge acts in both directions. */
final class UndirectedView(val graph: DynamicGraph) extends GraphView {
  def numNodes: Int = graph.numVertices
  def inEdges(node: Int): Iterator[(Int, Int, Byte)] =
    graph.inEdges(node).iterator.map(h => (h.other, h.weight, h.label)) ++
      graph.outEdges(node).iterator.map(h => (h.other, h.weight, h.label))
  def outNodes(node: Int): Iterator[Int] =
    graph.outEdges(node).iterator.map(_.other) ++ graph.inEdges(node).iterator.map(_.other)
  def outEdges(node: Int): Iterator[(Int, Int, Byte)] =
    graph.outEdges(node).iterator.map(h => (h.other, h.weight, h.label)) ++
      graph.inEdges(node).iterator.map(h => (h.other, h.weight, h.label))
  def policyDegree(node: Int): Int = graph.degree(node)
  def touchedDsts(u: Int, v: Int, label: Byte): Iterator[Int] = Iterator(u, v)
  def touchedSrcs(u: Int, v: Int, label: Byte): Iterator[Int] = Iterator(u, v)
  def baseVertex(node: Int): Int = node
}

/** Product view for RPQs: node = vertex * |Q| + automatonState. An edge
  * (w --l--> v) of the base graph induces product edges
  * ((w, q') → (v, q)) for every automaton transition q' --l--> q.
  */
final class ProductView(val graph: DynamicGraph, val automaton: Automaton) extends GraphView {
  private val nq = automaton.numStates
  def numNodes: Int = graph.numVertices * nq
  @inline def nodeOf(v: Int, q: Int): Int = v * nq + q
  @inline def vertexOf(node: Int): Int = node / nq
  @inline def stateOf(node: Int): Int = node % nq

  def inEdges(node: Int): Iterator[(Int, Int, Byte)] = {
    val v = vertexOf(node); val q = stateOf(node)
    graph.inEdges(v).iterator.flatMap { h =>
      automaton.prev(q, h.label).iterator.map(qp => (nodeOf(h.other, qp), h.weight, h.label))
    }
  }

  def outNodes(node: Int): Iterator[Int] = {
    val v = vertexOf(node); val q = stateOf(node)
    graph.outEdges(v).iterator.flatMap { h =>
      automaton.next(q, h.label).iterator.map(qn => nodeOf(h.other, qn))
    }
  }

  def outEdges(node: Int): Iterator[(Int, Int, Byte)] = {
    val v = vertexOf(node); val q = stateOf(node)
    graph.outEdges(v).iterator.flatMap { h =>
      automaton.next(q, h.label).iterator.map(qn => (nodeOf(h.other, qn), h.weight, h.label))
    }
  }

  def policyDegree(node: Int): Int = graph.degree(vertexOf(node))

  def touchedDsts(u: Int, v: Int, label: Byte): Iterator[Int] =
    automaton.statesEnteredOn(label).iterator.map(q => nodeOf(v, q))

  def touchedSrcs(u: Int, v: Int, label: Byte): Iterator[Int] =
    automaton.transitions.collect { case (from, l, _) if l == label => from }
      .distinct.iterator.map(q => nodeOf(u, q))

  def baseVertex(node: Int): Int = vertexOf(node)
}
