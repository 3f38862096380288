package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random
import repro.util.MemoryModel

class DroppedVTSpec extends AnyFunSuite {

  private def randomPairs(seed: Int): List[(Int, Int)] = {
    val rnd = new Random(seed)
    List.fill(rnd.nextInt(150))((rnd.nextInt(51), 1 + rnd.nextInt(25)))
  }

  private def refLatest(pairs: Set[(Int, Int)], node: Int, lo: Int, hi: Int): Int =
    pairs.collect { case (n, i) if n == node && i > lo && i <= hi => i }
      .maxOption.getOrElse(-1)

  test("DetDroppedVT matches a reference set exactly (randomized property)") {
    for (trial <- 0 until 60) {
      val pairs = randomPairs(trial)
      val det = new DetDroppedVT
      pairs.foreach { case (n, i) => det.add(n, i) }
      val ref = pairs.toSet
      assert(det.logicalCount == ref.size) // duplicates deduplicated
      for (node <- 0 to 50; lo <- Seq(-1, 0, 3, 10); hi <- Seq(5, 12, 25)) {
        assert(det.latestIn(node, lo, hi) == refLatest(ref, node, lo, hi))
        assert(det.itersIn(node, lo, hi).toSeq ==
          ref.collect { case (n, i) if n == node && i > lo && i <= hi => i }.toSeq.sorted)
      }
    }
  }

  test("ProbDroppedVT never misses an inserted pair (randomized property)") {
    for (trial <- 0 until 60) {
      val pairs = randomPairs(trial + 1000)
      val prob = new ProbDroppedVT(math.max(8, pairs.size))
      pairs.foreach { case (n, i) => prob.add(n, i) }
      pairs.foreach { case (n, i) =>
        assert(prob.latestIn(n, i - 1, i) == i, s"missed ($n, $i)")
        assert(prob.itersIn(n, 0, 30).contains(i))
      }
      // and latestIn over-approximates the reference
      val ref = pairs.toSet
      for (node <- 0 to 50; lo <- Seq(0, 5); hi <- Seq(10, 25))
        assert(prob.latestIn(node, lo, hi) >= refLatest(ref, node, lo, hi))
    }
  }

  test("Det memory grows with drops; Prob memory is flat") {
    val det = new DetDroppedVT
    val prob = new ProbDroppedVT(100000)
    val probBytes = prob.sizeBytes
    (0 until 10000).foreach { k => det.add(k % 500, k / 500 + 1); prob.add(k % 500, k / 500 + 1) }
    assert(det.sizeBytes == 10000 * MemoryModel.DroppedVtBytes)
    assert(prob.sizeBytes == probBytes)
  }

  test("Det-Drop's scalability floor arithmetic (d / (d+s))") {
    assert(MemoryModel.detDropFloor == 0.5)
    assert(MemoryModel.DiffBytes == MemoryModel.VtBytes + MemoryModel.StateBytes)
  }

  test("latestIn respects the exclusive lower bound") {
    val det = new DetDroppedVT
    det.add(1, 5)
    assert(det.latestIn(1, 5, 10) == -1)
    assert(det.latestIn(1, 4, 10) == 5)
    assert(det.latestIn(1, 4, 4) == -1)
  }
}

class DropPolicySpec extends AnyFunSuite {

  test("Random policy is deterministic and tracks p") {
    val p3 = DropPolicy.Random(0.3, seed = 5)
    val again = DropPolicy.Random(0.3, seed = 5)
    val decisions = for (n <- 0 until 200; i <- 1 to 10) yield p3.shouldDrop(n, i, 4)
    val decisions2 = for (n <- 0 until 200; i <- 1 to 10) yield again.shouldDrop(n, i, 4)
    assert(decisions == decisions2)
    val rate = decisions.count(identity).toDouble / decisions.size
    assert(rate > 0.2 && rate < 0.4, s"empirical rate $rate should be near 0.3")
  }

  test("Random p=0 drops nothing; p=1 drops everything") {
    val never = DropPolicy.Random(0.0)
    val always = DropPolicy.Random(1.0)
    for (n <- 0 until 50; i <- 1 to 5) {
      assert(!never.shouldDrop(n, i, 3))
      assert(always.shouldDrop(n, i, 3))
    }
  }

  test("Degree policy: always drop below tau_min, never above tau_max") {
    val pol = DropPolicy.Degree(p = 0.0, tauMin = 2, tauMax = 10)
    assert(pol.shouldDrop(1, 1, degree = 1))   // below tau_min: dropped even at p=0
    assert(!pol.shouldDrop(1, 1, degree = 11)) // above tau_max: kept always
    assert(!pol.shouldDrop(1, 1, degree = 5))  // middle band at p=0: kept
    val pol1 = DropPolicy.Degree(p = 1.0, tauMin = 2, tauMax = 10)
    assert(pol1.shouldDrop(1, 1, degree = 5))  // middle band at p=1: dropped
    assert(!pol1.shouldDrop(1, 1, degree = 11))
  }

  test("KeepAll never drops") {
    for (n <- 0 until 20; i <- 1 to 5; d <- Seq(0, 1, 100))
      assert(!DropPolicy.KeepAll.shouldDrop(n, i, d))
  }

  test("draw() is uniform enough across the unit interval") {
    val draws = for (n <- 0 until 100; i <- 1 to 100) yield DropPolicy.draw(n, i, 7L)
    assert(draws.forall(d => d >= 0.0 && d < 1.0))
    val mean = draws.sum / draws.size
    assert(math.abs(mean - 0.5) < 0.02, s"mean $mean")
  }
}
