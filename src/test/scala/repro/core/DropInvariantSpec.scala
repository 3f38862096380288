package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random
import repro.graph._

/** The strongest dropping invariant: under any drop configuration, the
  * *full per-iteration representation* (AccessD_i^v for every v and i, not
  * just final states) must equal the from-scratch trace of the current
  * graph — dropped records are recomputed transparently.
  */
class DropInvariantSpec extends AnyFunSuite {

  private def randomDyn(seed: Int, nV: Int, nE: Int, nUp: Int):
      (DynamicGraph, Vector[EdgeUpdate]) = {
    val rnd = new Random(seed)
    val g = new DynamicGraph(nV)
    val live = collection.mutable.ArrayBuffer.empty[(Int, Int, Int)]
    (0 until nE).foreach { _ =>
      val s = rnd.nextInt(nV); var d = rnd.nextInt(nV); if (d == s) d = (d + 1) % nV
      val w = 1 + rnd.nextInt(10); g.addEdge(s, d, w); live += ((s, d, w))
    }
    val ups = Vector.fill(nUp) {
      if (rnd.nextDouble() < 0.35 && live.nonEmpty) {
        val i = rnd.nextInt(live.size); val (s, d, w) = live.remove(i)
        EdgeUpdate(s, d, w, 0, add = false)
      } else {
        val s = rnd.nextInt(nV); var d = rnd.nextInt(nV); if (d == s) d = (d + 1) % nV
        val w = 1 + rnd.nextInt(10); live += ((s, d, w))
        EdgeUpdate(s, d, w, 0, add = true)
      }
    }
    (g, ups)
  }

  private def checkFullTrace(jod: Jod, mkSpec: DynamicGraph => IFESpec, ctx: String): Unit = {
    val g = jod.spec.view.graph
    val ref = ScratchEngine.run(mkSpec(g), withTrace = true)
    val n = jod.spec.view.numNodes
    val states = Array.tabulate(n)(jod.spec.init)
    for (i <- 0 to math.max(ref.trace.size - 1, jod.maxIterSeen)) {
      if (i > 0 && i < ref.trace.size) ref.trace(i).foreach { case (v, nv) => states(v) = nv }
      var v = 0
      while (v < n) {
        assert(jod.access(v, i) == states(v), s"$ctx node $v iter $i")
        v += 1
      }
    }
  }

  private def runCase(name: String, mkVt: () => DroppedVT, policy: DropPolicy, seed: Int): Unit = {
    val (g, ups) = randomDyn(seed, 22, 60, 16)
    val mkSpec = (gr: DynamicGraph) => Queries.sssp(gr, 0)
    val jod = new Jod(mkSpec(g), policy, mkVt())
    jod.initialRun()
    checkFullTrace(jod, mkSpec, s"$name G0")
    ups.grouped(2).zipWithIndex.foreach { case (b, bi) =>
      jod.applyBatch(b)
      checkFullTrace(jod, mkSpec, s"$name batch $bi")
    }
  }

  test("Det-Drop full-trace invariant (random p=0.4)") {
    runCase("det-r4", () => new DetDroppedVT, DropPolicy.Random(0.4, 5), 101)
  }

  test("Det-Drop full-trace invariant (random p=1.0)") {
    runCase("det-r10", () => new DetDroppedVT, DropPolicy.Random(1.0, 7), 102)
  }

  test("Det-Drop full-trace invariant (degree-based p=0.7)") {
    runCase("det-deg", () => new DetDroppedVT, DropPolicy.Degree(0.7, 2, 6, 9), 103)
  }

  test("Prob-Drop full-trace invariant (random p=0.4)") {
    runCase("prob-r4", () => new ProbDroppedVT(2048), DropPolicy.Random(0.4, 11), 104)
  }

  test("Prob-Drop full-trace invariant under extreme false positives") {
    runCase("prob-fp", () => new ProbDroppedVT(64, bitsPerElement = 1), DropPolicy.Random(0.6, 13), 105)
  }

  test("Prob-Drop full-trace invariant (degree-based p=1.0)") {
    runCase("prob-deg", () => new ProbDroppedVT(2048), DropPolicy.Degree(1.0, 2, 8, 17), 106)
  }

  test("K-hop full-trace invariant under full random dropping") {
    val (g, ups) = randomDyn(107, 25, 70, 14)
    val mkSpec = (gr: DynamicGraph) => Queries.khop(gr, 0, 4)
    val jod = new Jod(mkSpec(g), DropPolicy.Random(1.0, 23), new DetDroppedVT)
    jod.initialRun()
    checkFullTrace(jod, mkSpec, "khop G0")
    ups.grouped(2).zipWithIndex.foreach { case (b, bi) =>
      jod.applyBatch(b)
      checkFullTrace(jod, mkSpec, s"khop batch $bi")
    }
  }

  test("WCC full-trace invariant under heavy dropping with deletions") {
    val (g, ups) = randomDyn(108, 20, 40, 12)
    val mkSpec = (gr: DynamicGraph) => Queries.wcc(gr)
    val jod = new Jod(mkSpec(g), DropPolicy.Random(0.8, 29), new DetDroppedVT)
    jod.initialRun()
    ups.grouped(2).zipWithIndex.foreach { case (b, bi) =>
      jod.applyBatch(b)
      checkFullTrace(jod, mkSpec, s"wcc batch $bi")
    }
  }
}
