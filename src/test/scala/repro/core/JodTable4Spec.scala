package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.RunningExample._

/** JOD with eager merging on the running example: the one-dimensional
  * positive-only difference lists must match the §4.2 discussion (Table 4's
  * merged representation), and final states must always equal scratch.
  */
class JodTable4Spec extends AnyFunSuite {

  test("after G1, vertex d stores {(1,100),(3,50)} as in §4.2") {
    val jod = new Jod(Queries.sssp(graph(), A))
    jod.initialRun()
    jod.applyBatch(update1)
    assert(jod.diffs(D).entries === Seq((1, 100.0), (3, 50.0)))
  }

  test("initial run records the G0 per-iteration changes (positive only)") {
    val jod = new Jod(Queries.sssp(graph(), A))
    jod.initialRun()
    assert(jod.diffs(B).entries === Seq((1, 30.0)))
    assert(jod.diffs(D).entries === Seq((1, 20.0)))
    assert(jod.diffs(E).entries === Seq((1, 10.0)))
    assert(jod.diffs(C).entries === Seq((2, 40.0)))
    assert(jod.diffs(A).entries === Seq.empty) // init state is implicit
  }

  test("states equal scratch after every version") {
    val jod = new Jod(Queries.sssp(graph(), A))
    jod.initialRun()
    def check(): Unit = {
      val expected = ScratchEngine.states(Queries.sssp(jod.spec.view.graph, A))
      assert(jod.currentStates().toSeq === expected.toSeq)
    }
    check()
    jod.applyBatch(update1); check()
    jod.applyBatch(update2); check()
    val s = jod.currentStates()
    assert(s(D) === 100.0 && s(C) === 120.0)
  }

  test("access reads intermediate-iteration states (floor semantics)") {
    val jod = new Jod(Queries.sssp(graph(), A))
    jod.initialRun()
    assert(jod.access(C, 1) === Queries.INF) // c not yet reached at iter 1
    assert(jod.access(C, 2) === 40.0)
    assert(jod.access(C, 100) === 40.0) // beyond horizon: latest value
    assert(jod.access(A, 0) === 0.0)
    assert(jod.access(B, 0) === Queries.INF)
  }
}
