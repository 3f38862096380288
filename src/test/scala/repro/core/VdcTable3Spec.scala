package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.RunningExample._

/** VDC must reproduce the paper's Table 3 — the full difference trace of
  * the Bellman-Ford IFE dataflow on the Figure 2 dynamic graph — cell by
  * cell. This pins down the 2-D timestamp semantics, the direct and
  * upper-bound rules, and the per-source Join output diffing.
  */
class VdcTable3Spec extends AnyFunSuite {
  private val INF = Queries.INF

  /** Difference multiset at a trace cell, as a sorted list of (node, value,
    * mult), ignoring intra-cell order.
    */
  private def cell(t: Seq[(Int, Double, Int)]): Set[(Int, Double, Int)] = {
    // merge multiplicities of identical (node, value) then drop zeros
    t.groupBy(x => (x._1, x._2)).map { case ((n, v), xs) => (n, v, xs.map(_._3).sum) }
      .filter(_._3 != 0).toSet
  }

  private def freshMaintained(): Vdc = {
    val vdc = new Vdc(Queries.sssp(graph(), A), captureTrace = true)
    vdc.initialRun()
    vdc
  }

  test("G0 column: initial differential run matches Table 3") {
    val vdc = freshMaintained()
    // iteration 0: D = all initial states
    assert(cell(vdc.dDiffsAt(0, 0)) ===
      Set((A, 0.0, 1), (B, INF, 1), (C, INF, 1), (D, INF, 1), (E, INF, 1)))
    // iteration 1
    assert(cell(vdc.jDiffsAt(0, 1)) === Set((B, 30.0, 1), (D, 20.0, 1), (E, 10.0, 1)))
    assert(cell(vdc.dDiffsAt(0, 1)) ===
      Set((B, INF, -1), (B, 30.0, 1), (D, INF, -1), (D, 20.0, 1), (E, INF, -1), (E, 10.0, 1)))
    // iteration 2: two +(c,40) (from b and from d) merge to multiplicity 2
    assert(cell(vdc.jDiffsAt(0, 2)) === Set((C, 40.0, 2), (E, 30.0, 1)))
    assert(cell(vdc.dDiffsAt(0, 2)) === Set((C, INF, -1), (C, 40.0, 1)))
    // iteration 3
    assert(cell(vdc.jDiffsAt(0, 3)) === Set((D, 50.0, 1)))
    assert(cell(vdc.dDiffsAt(0, 3)) === Set.empty[(Int, Double, Int)])
    // iteration 4: fixpoint
    assert(cell(vdc.jDiffsAt(0, 4)) === Set.empty[(Int, Double, Int)])
    assert(cell(vdc.dDiffsAt(0, 4)) === Set.empty[(Int, Double, Int)])
  }

  test("G1 column: maintaining the (a,d) 20->100 update matches Table 3") {
    val vdc = freshMaintained()
    vdc.applyBatch(update1)
    assert(cell(vdc.jDiffsAt(1, 0)) === Set.empty[(Int, Double, Int)])
    assert(cell(vdc.dDiffsAt(1, 0)) === Set.empty[(Int, Double, Int)])
    assert(cell(vdc.jDiffsAt(1, 1)) === Set((D, 20.0, -1), (D, 100.0, 1)))
    assert(cell(vdc.dDiffsAt(1, 1)) === Set((D, 20.0, -1), (D, 100.0, 1)))
    assert(cell(vdc.jDiffsAt(1, 2)) ===
      Set((C, 40.0, -1), (C, 120.0, 1), (E, 30.0, -1), (E, 110.0, 1)))
    assert(cell(vdc.dDiffsAt(1, 2)) === Set.empty[(Int, Double, Int)])
    assert(cell(vdc.jDiffsAt(1, 3)) === Set.empty[(Int, Double, Int)])
    assert(cell(vdc.dDiffsAt(1, 3)) === Set((D, 100.0, -1), (D, 50.0, 1)))
    assert(cell(vdc.jDiffsAt(1, 4)) ===
      Set((C, 120.0, -1), (C, 70.0, 1), (E, 110.0, -1), (E, 60.0, 1)))
    assert(cell(vdc.dDiffsAt(1, 4)) === Set.empty[(Int, Double, Int)])
  }

  test("G2 column: maintaining the (b,c) 10->100 update matches Table 3") {
    val vdc = freshMaintained()
    vdc.applyBatch(update1)
    vdc.applyBatch(update2)
    assert(cell(vdc.jDiffsAt(2, 1)) === Set.empty[(Int, Double, Int)])
    assert(cell(vdc.dDiffsAt(2, 1)) === Set.empty[(Int, Double, Int)])
    assert(cell(vdc.jDiffsAt(2, 2)) === Set((C, 40.0, -1), (C, 130.0, 1)))
    assert(cell(vdc.dDiffsAt(2, 2)) === Set((C, 40.0, -1), (C, 120.0, 1)))
    assert(cell(vdc.jDiffsAt(2, 3)) === Set((D, 50.0, -1), (D, 130.0, 1)))
    assert(cell(vdc.dDiffsAt(2, 3)) === Set((D, 50.0, -1), (D, 100.0, 1)))
    assert(cell(vdc.jDiffsAt(2, 4)) ===
      Set((C, 70.0, -1), (C, 120.0, 1), (E, 60.0, -1), (E, 110.0, 1)))
    assert(cell(vdc.dDiffsAt(2, 4)) === Set.empty[(Int, Double, Int)])
  }

  test("final states after each version match Bellman-Ford from scratch") {
    val vdc = freshMaintained()
    def check(): Unit = {
      val expected = ScratchEngine.states(Queries.sssp(vdc.spec.view.graph, A))
      assert(vdc.currentStates().toSeq === expected.toSeq)
    }
    check()
    vdc.applyBatch(update1); check()
    vdc.applyBatch(update2); check()
    // G2 distances from the paper's discussion: d ends at 100, c at 120.
    val s = vdc.currentStates()
    assert(s(D) === 100.0 && s(C) === 120.0 && s(B) === 30.0 && s(E) === 10.0)
  }
}
