package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random
import repro.graph._

/** The strongest oracle in the repo: on randomized dynamic graphs with
  * mixed insertions and deletions, every differential configuration (VDC,
  * DD-sim with periodic merging, JOD, Det-Drop and Prob-Drop at various p
  * and policies) must produce, after *every* batch, exactly the states that
  * re-running the computation from scratch on the updated graph produces.
  */
class EquivalenceSpec extends AnyFunSuite {

  /** Build a random graph + update stream, deterministic in `seed`. */
  private def randomDynamic(seed: Int, nV: Int, nE: Int, nUpdates: Int,
                            weighted: Boolean, numLabels: Int):
      (Vector[(Int, Int, Int, Byte)], Vector[EdgeUpdate]) = {
    val rnd = new Random(seed)
    def edge(): (Int, Int, Int, Byte) = {
      val s = rnd.nextInt(nV); var d = rnd.nextInt(nV)
      if (d == s) d = (d + 1) % nV
      (s, d, if (weighted) 1 + rnd.nextInt(10) else 1, rnd.nextInt(numLabels).toByte)
    }
    val initial = Vector.fill(nE)(edge())
    val live = scala.collection.mutable.ArrayBuffer[(Int, Int, Int, Byte)](initial: _*)
    val updates = Vector.fill(nUpdates) {
      if (live.nonEmpty && rnd.nextDouble() < 0.4) {
        val i = rnd.nextInt(live.size)
        val (s, d, w, l) = live.remove(i)
        EdgeUpdate(s, d, w, l, add = false)
      } else {
        val e = edge(); live += e
        EdgeUpdate(e._1, e._2, e._3, e._4, add = true)
      }
    }
    (initial, updates)
  }

  private type SpecFactory = DynamicGraph => IFESpec

  private val queries: Seq[(String, Boolean, Int, SpecFactory)] = Seq(
    // (name, weighted, numLabels, factory)
    ("sssp", true, 1, g => Queries.sssp(g, source = 0)),
    ("khop5", false, 1, g => Queries.khop(g, source = 0, k = 5)),
    ("wcc", false, 1, g => Queries.wcc(g)),
    ("rpq-q2", false, 3, g => Queries.rpq(g, source = 0, Automaton.q2(0, 1))),
    ("pagerank", false, 1, g => Queries.pagerank(g)),
  )

  private def assertStatesEqual(name: String, got: Array[Double], exp: Array[Double],
                                eps: Double, ctx: String): Unit = {
    assert(got.length == exp.length)
    var i = 0
    while (i < got.length) {
      val ok =
        if (eps == 0) got(i) == exp(i)
        else (got(i).isInfinite && exp(i).isInfinite) || math.abs(got(i) - exp(i)) <= eps
      assert(ok, s"$name $ctx: node $i got ${got(i)} expected ${exp(i)}")
      i += 1
    }
  }

  private def checkEngine(engineName: String,
                          mkEngine: (IFESpec, DynamicGraph) => (Seq[EdgeUpdate] => Unit, () => Array[Double]),
                          seed: Int): Unit = {
    for ((qName, weighted, numLabels, mkSpec) <- queries) {
      val (initial, updates) = randomDynamic(seed + qName.hashCode, 25, 70, 20, weighted, numLabels)
      val g = DynamicGraph.fromEdges(25, initial)
      val spec = mkSpec(g)
      val (applyBatch, states) = mkEngine(spec, g)
      val eps = if (qName == "pagerank") 1e-7 else 0.0
      // check initial
      val refG0 = DynamicGraph.fromEdges(25, initial)
      assertStatesEqual(s"$engineName/$qName", states(), ScratchEngine.states(mkSpec(refG0)), eps, "G0")
      // batches of size 2
      val refG = refG0
      updates.grouped(2).zipWithIndex.foreach { case (batch, bi) =>
        applyBatch(batch)
        refG.apply(batch)
        assertStatesEqual(s"$engineName/$qName", states(), ScratchEngine.states(mkSpec(refG)), eps, s"batch $bi")
      }
    }
  }

  test("VDC matches scratch on random dynamic graphs (all queries)") {
    checkEngine("vdc", (spec, _) => {
      val e = new Vdc(spec); e.initialRun()
      (b => e.applyBatch(b), () => e.currentStates())
    }, seed = 1)
  }

  test("DD-sim (periodic merging every 3 batches) matches scratch") {
    checkEngine("dd", (spec, _) => {
      val e = new Vdc(spec, mergeEvery = 3); e.initialRun()
      (b => e.applyBatch(b), () => e.currentStates())
    }, seed = 2)
  }

  test("JOD matches scratch on random dynamic graphs (all queries)") {
    checkEngine("jod", (spec, _) => {
      val e = new Jod(spec); e.initialRun()
      (b => e.applyBatch(b), () => e.currentStates())
    }, seed = 3)
  }

  test("Det-Drop with Random policy matches scratch (p = 0.3)") {
    checkEngine("det-random", (spec, _) => {
      val e = new Jod(spec, DropPolicy.Random(0.3, seed = 11), new DetDroppedVT)
      e.initialRun()
      (b => e.applyBatch(b), () => e.currentStates())
    }, seed = 4)
  }

  test("Det-Drop with Degree policy matches scratch (p = 0.5)") {
    checkEngine("det-degree", (spec, g) => {
      val tauMax = g.degreePercentile(80)
      val e = new Jod(spec, DropPolicy.Degree(0.5, tauMin = 2, tauMax = tauMax), new DetDroppedVT)
      e.initialRun()
      (b => e.applyBatch(b), () => e.currentStates())
    }, seed = 5)
  }

  test("Prob-Drop (Bloom) with Random policy matches scratch (p = 0.3)") {
    checkEngine("prob-random", (spec, _) => {
      val e = new Jod(spec, DropPolicy.Random(0.3, seed = 13), new ProbDroppedVT(4096))
      e.initialRun()
      (b => e.applyBatch(b), () => e.currentStates())
    }, seed = 6)
  }

  test("Det-Drop at p = 1.0 (drop everything droppable) matches scratch") {
    checkEngine("det-all", (spec, _) => {
      val e = new Jod(spec, DropPolicy.Random(1.0, seed = 17), new DetDroppedVT)
      e.initialRun()
      (b => e.applyBatch(b), () => e.currentStates())
    }, seed = 7)
  }

  test("Prob-Drop with an undersized (high-FPR) Bloom filter is still correct") {
    // a tiny filter forces many false positives: spurious recomputation
    // must never change results.
    checkEngine("prob-tiny", (spec, _) => {
      val e = new Jod(spec, DropPolicy.Random(0.5, seed = 19), new ProbDroppedVT(64, bitsPerElement = 2))
      e.initialRun()
      (b => e.applyBatch(b), () => e.currentStates())
    }, seed = 8)
  }
}
