package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.graph._

/** Crafted scenarios that specifically require DC's upper-bound rule —
  * each was a soundness gap candidate during design and must stay covered.
  */
class UpperBoundRuleSpec extends AnyFunSuite {

  /** Scenario: updating edge (z→v) must also rerun v at the *later*
    * iteration where in-neighbour w's historical difference lands, even
    * though no fresh difference arrives there (lub of δE and old δD).
    * Graph: s→z(0 hops), z→v weight 5, and a slow path s→a→w→v making w
    * reach v only at iteration 3.
    */
  private def lubGraph(): DynamicGraph = {
    val g = new DynamicGraph(6)
    // s=0, z=1, a=2, w=3, v=4
    g.addEdge(0, 1, 1) // s->z
    g.addEdge(1, 4, 5) // z->v   (v at iter 2 via z: 1+5=6)
    g.addEdge(0, 2, 1) // s->a
    g.addEdge(2, 3, 1) // a->w   (w at iter 2: 2)
    g.addEdge(3, 4, 1) // w->v   (v at iter 3 via w: 3)
    g
  }

  test("JOD: weight increase is corrected at the later iteration via UB rule") {
    val g = lubGraph()
    val jod = new Jod(Queries.sssp(g, 0))
    jod.initialRun()
    assert(jod.currentStates()(4) == 3.0)
    // raise z->v from 5 to 50: v's iter-2 value worsens but iter-3 value (3,
    // via w) still wins; then raise w->v too and the answer must track z.
    jod.applyBatch(Seq(EdgeUpdate(1, 4, 5, 0, add = false), EdgeUpdate(1, 4, 50, 0, add = true)))
    assert(jod.currentStates()(4) == 3.0)
    assert(jod.currentStates().toSeq == ScratchEngine.states(Queries.sssp(g, 0)).toSeq)
    jod.applyBatch(Seq(EdgeUpdate(3, 4, 1, 0, add = false), EdgeUpdate(3, 4, 90, 0, add = true)))
    assert(jod.currentStates()(4) == 51.0)
    assert(jod.currentStates().toSeq == ScratchEngine.states(Queries.sssp(g, 0)).toSeq)
  }

  test("VDC: same scenario through 2-D timestamps") {
    val g = lubGraph()
    val vdc = new Vdc(Queries.sssp(g, 0))
    vdc.initialRun()
    vdc.applyBatch(Seq(EdgeUpdate(1, 4, 5, 0, add = false), EdgeUpdate(1, 4, 50, 0, add = true)))
    assert(vdc.currentStates()(4) == 3.0)
    vdc.applyBatch(Seq(EdgeUpdate(3, 4, 1, 0, add = false), EdgeUpdate(3, 4, 90, 0, add = true)))
    assert(vdc.currentStates().toSeq == ScratchEngine.states(Queries.sssp(g, 0)).toSeq)
  }

  /** Scenario: a node with a *stale* stored entry at a later iteration —
    * v changes at iteration 1 this batch while holding a pre-batch entry at
    * iteration 3; the own-diff upper-bound scan must revisit iteration 3.
    */
  test("JOD: own later stored entries are revisited after an early change") {
    val g = new DynamicGraph(5)
    g.addEdge(0, 1, 10) // s->v direct: v@1 = 10
    g.addEdge(0, 2, 1)  // s->a
    g.addEdge(2, 3, 1)  // a->b
    g.addEdge(3, 1, 1)  // b->v: v@3 = 3
    val jod = new Jod(Queries.sssp(g, 0))
    jod.initialRun()
    assert(jod.diffEntries(1).map(_._1).contains(3)) // entry at iteration 3
    // shorten the direct edge below the 3-hop path: entry at 3 must go stale
    // and the representation must be repaired.
    jod.applyBatch(Seq(EdgeUpdate(0, 1, 10, 0, add = false), EdgeUpdate(0, 1, 2, 0, add = true)))
    assert(jod.currentStates()(1) == 2.0)
    assert(jod.access(1, 3) == 2.0) // no stale 3 left visible
    assert(jod.currentStates().toSeq == ScratchEngine.states(Queries.sssp(g, 0)).toSeq)
  }

  test("JOD: deletion lengthens the trace beyond the previous horizon") {
    val g = new DynamicGraph(6)
    g.addEdge(0, 5, 1) // shortcut: everything near
    (0 until 5).foreach(v => g.addEdge(v, v + 1, 1)) // chain 0..5
    val jod = new Jod(Queries.khop(g, 0, 5))
    jod.initialRun()
    val horizonBefore = jod.maxIterSeen
    assert(jod.currentStates()(5) == 1.0)
    jod.applyBatch(Seq(EdgeUpdate(0, 5, 1, 0, add = false)))
    assert(jod.currentStates()(5) == 5.0) // now only via the chain
    assert(jod.maxIterSeen > horizonBefore)
    assert(jod.currentStates().toSeq == ScratchEngine.states(Queries.khop(g, 0, 5)).toSeq)
  }

  test("JOD: disconnection raises states to INF") {
    val g = new DynamicGraph(4)
    g.addEdge(0, 1, 2); g.addEdge(1, 2, 2); g.addEdge(2, 3, 2)
    val jod = new Jod(Queries.sssp(g, 0))
    jod.initialRun()
    jod.applyBatch(Seq(EdgeUpdate(1, 2, 2, 0, add = false)))
    val s = jod.currentStates()
    assert(s(0) == 0.0 && s(1) == 2.0 && s(2) == Queries.INF && s(3) == Queries.INF)
  }
}

/** RPQ templates across engines on labeled random graphs. */
class RpqEngineMatrixSpec extends AnyFunSuite {
  import scala.util.Random

  private def labeledGraph(seed: Int): DynamicGraph = {
    val rnd = new Random(seed)
    val g = new DynamicGraph(18)
    (0 until 50).foreach { _ =>
      val s = rnd.nextInt(18); var d = rnd.nextInt(18); if (d == s) d = (d + 1) % 18
      g.addEdge(s, d, 1, rnd.nextInt(3).toByte)
    }
    g
  }

  private def updates(seed: Int): Vector[EdgeUpdate] = {
    val rnd = new Random(seed + 500)
    Vector.fill(10) {
      val s = rnd.nextInt(18); var d = rnd.nextInt(18); if (d == s) d = (d + 1) % 18
      EdgeUpdate(s, d, 1, rnd.nextInt(3).toByte, add = true)
    }
  }

  private val templates = Seq(
    "Q1" -> Automaton.q1(0),
    "Q2" -> Automaton.q2(0, 1),
    "Q3" -> Automaton.q3(Seq(0, 1, 2, 0, 1)))

  for ((name, m) <- templates) {
    test(s"RPQ $name: JOD matches scratch over a dynamic labeled graph") {
      val g = labeledGraph(name.hashCode)
      val jod = new Jod(Queries.rpq(g, 0, m))
      jod.initialRun()
      updates(name.hashCode).grouped(2).foreach { b =>
        jod.applyBatch(b)
        assert(jod.currentStates().toSeq ==
          ScratchEngine.states(Queries.rpq(g, 0, m)).toSeq)
      }
    }

    test(s"RPQ $name: VDC matches scratch over a dynamic labeled graph") {
      val g = labeledGraph(name.hashCode + 1)
      val vdc = new Vdc(Queries.rpq(g, 0, m))
      vdc.initialRun()
      updates(name.hashCode + 1).grouped(2).foreach { b =>
        vdc.applyBatch(b)
        assert(vdc.currentStates().toSeq ==
          ScratchEngine.states(Queries.rpq(g, 0, m)).toSeq)
      }
    }
  }
}
