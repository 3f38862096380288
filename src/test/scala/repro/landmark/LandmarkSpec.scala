package repro.landmark

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random
import repro.core.{Queries, ScratchEngine}
import repro.graph._

/** Scratch-Landmark (§6.6): bounds must be sound, pruning must never change
  * an answer, and the differentially-maintained indices must equal
  * freshly-computed ones after every batch.
  */
class LandmarkSpec extends AnyFunSuite {

  private def randomGraph(seed: Int, nV: Int = 40, nE: Int = 140): DynamicGraph = {
    val rnd = new Random(seed)
    val g = new DynamicGraph(nV)
    (0 until nE).foreach { _ =>
      val s = rnd.nextInt(nV); var d = rnd.nextInt(nV); if (d == s) d = (d + 1) % nV
      g.addEdge(s, d, 1 + rnd.nextInt(10))
    }
    g
  }

  test("upper and lower bounds bracket the true distance") {
    for (seed <- 1 to 5) {
      val g = randomGraph(seed)
      val lm = new Landmark(g, Landmark.topDegree(g, 4))
      val rnd = new Random(seed + 100)
      for (_ <- 0 until 20) {
        val s = rnd.nextInt(g.numVertices); val d = rnd.nextInt(g.numVertices)
        val truth = Landmark.scratchSpsp(g, s, d)
        assert(lm.upperBound(s, d) >= truth, s"seed $seed ub($s,$d)")
        assert(lm.lowerBound(s, d) <= truth, s"seed $seed lb($s,$d)")
      }
    }
  }

  test("pruned SPSP equals unpruned SPSP") {
    for (seed <- 1 to 5) {
      val g = randomGraph(seed + 10)
      val lm = new Landmark(g, Landmark.topDegree(g, 4))
      val rnd = new Random(seed)
      for (_ <- 0 until 25) {
        val s = rnd.nextInt(g.numVertices); val d = rnd.nextInt(g.numVertices)
        assert(lm.prunedSpsp(s, d) == Landmark.scratchSpsp(g, s, d), s"seed $seed ($s,$d)")
      }
    }
  }

  test("maintained landmark indices equal fresh indices after updates") {
    val g = randomGraph(31)
    val marks = Landmark.topDegree(g, 3)
    val lm = new Landmark(g, marks)
    val rnd = new Random(99)
    for (bi <- 0 until 5) {
      val batch = Seq.fill(2) {
        val a = rnd.nextInt(g.numVertices); var b = rnd.nextInt(g.numVertices)
        if (b == a) b = (b + 1) % g.numVertices
        EdgeUpdate(a, b, 1 + rnd.nextInt(10), 0, add = true)
      }
      lm.applyBatch(batch)
      // pruned answers must still match from-scratch answers on the updated graph
      for (_ <- 0 until 10) {
        val s = rnd.nextInt(g.numVertices); val d = rnd.nextInt(g.numVertices)
        assert(lm.prunedSpsp(s, d) == Landmark.scratchSpsp(g, s, d), s"batch $bi ($s,$d)")
      }
    }
  }

  test("maintained indices track deletions too") {
    val g = randomGraph(41)
    val lm = new Landmark(g, Landmark.topDegree(g, 3))
    val victim = g.edgeList.head
    lm.applyBatch(Seq(EdgeUpdate(victim._1, victim._2, victim._3, victim._4, add = false)))
    val rnd = new Random(5)
    for (_ <- 0 until 10) {
      val s = rnd.nextInt(g.numVertices); val d = rnd.nextInt(g.numVertices)
      assert(lm.prunedSpsp(s, d) == Landmark.scratchSpsp(g, s, d))
    }
  }

  test("topDegree picks the highest-degree vertices") {
    val g = new DynamicGraph(5)
    g.addEdge(0, 1); g.addEdge(0, 2); g.addEdge(0, 3); g.addEdge(1, 2)
    assert(Landmark.topDegree(g, 2) == Seq(0, 1) || Landmark.topDegree(g, 2) == Seq(0, 2))
    assert(Landmark.topDegree(g, 1) == Seq(0))
  }
}
