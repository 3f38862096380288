package repro.graph

/** A (nondeterministic) finite automaton over edge labels, used to evaluate
  * regular path queries via the product-graph construction (§3.1, §6.1.2).
  *
  * @param numStates   states are 0 until numStates; 0 is the start state
  * @param transitions (fromState, label, toState) triples
  * @param accepting   set of accepting states
  */
final case class Automaton(numStates: Int, transitions: Seq[(Int, Byte, Int)], accepting: Set[Int]) {
  require(numStates > 0 && accepting.nonEmpty)

  /** trans(q)(label) = successor states of q on `label`. */
  private val byFrom: Array[Map[Byte, Seq[Int]]] = {
    val arr = Array.fill(numStates)(Map.empty[Byte, Seq[Int]])
    transitions.groupBy(_._1).foreach { case (q, ts) =>
      arr(q) = ts.groupBy(_._2).map { case (l, triples) => l -> triples.map(_._3) }
    }
    arr
  }

  /** trans⁻¹(q)(label) = predecessor states reaching q on `label`. */
  private val byTo: Array[Map[Byte, Seq[Int]]] = {
    val arr = Array.fill(numStates)(Map.empty[Byte, Seq[Int]])
    transitions.groupBy(_._3).foreach { case (q, ts) =>
      arr(q) = ts.groupBy(_._2).map { case (l, triples) => l -> triples.map(_._1) }
    }
    arr
  }

  def next(q: Int, label: Byte): Seq[Int] = byFrom(q).getOrElse(label, Nil)
  def prev(q: Int, label: Byte): Seq[Int] = byTo(q).getOrElse(label, Nil)

  /** States reachable on `label` from any state (dst side of an edge update). */
  def statesEnteredOn(label: Byte): Seq[Int] =
    transitions.collect { case (_, l, to) if l == label => to }.distinct
}

/** The RPQ templates of §6.1.2 (from the Wikidata query-log study [4]),
  * instantiated over LDBC SNB-style labels.
  */
object Automaton {
  /** Q1 = a*  — reflexive-transitive closure of one label. */
  def q1(a: Byte): Automaton =
    Automaton(1, Seq((0, a, 0)), accepting = Set(0))

  /** Q2 = a ∘ b*  — one a-edge then any number of b-edges. */
  def q2(a: Byte, b: Byte): Automaton =
    Automaton(2, Seq((0, a, 1), (1, b, 1)), accepting = Set(1))

  /** Q3 = a ∘ b ∘ c ∘ d ∘ e — a fixed 5-label chain. */
  def q3(labels: Seq[Byte]): Automaton = {
    require(labels.size == 5)
    Automaton(6, labels.zipWithIndex.map { case (l, i) => (i, l, i + 1) }, accepting = Set(5))
  }
}
