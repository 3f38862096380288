package repro.util

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

/** The Bloom filter underlying Prob-Drop must never return false negatives
  * (§5.1.2: "Prob-Drop requires a probabilistic data structure that never
  * returns false negatives"), and its size must not grow with insertions.
  */
class BloomFilterSpec extends AnyFunSuite {

  test("no false negatives for any inserted key set (randomized property)") {
    for (trial <- 0 until 50) {
      val rnd = new Random(trial)
      val keys = List.fill(rnd.nextInt(300))(rnd.nextLong())
      val bf = new BloomFilter(math.max(1, keys.size))
      keys.foreach(bf.add)
      keys.foreach(k => assert(bf.mightContain(k), s"false negative for $k (trial $trial)"))
    }
  }

  test("no false negatives even when overfilled far beyond capacity") {
    val bf = new BloomFilter(16, bitsPerElement = 4)
    val keys = (0L until 2000L).map(_ * 7919L + 13L)
    keys.foreach(bf.add)
    keys.foreach(k => assert(bf.mightContain(k)))
  }

  test("false positive rate is low when sized correctly") {
    val n = 10000
    val bf = new BloomFilter(n, bitsPerElement = 10)
    (0 until n).foreach(i => bf.add(i.toLong))
    val probes = (1000000 until 1100000).map(_.toLong)
    val fp = probes.count(bf.mightContain)
    val rate = fp.toDouble / probes.size
    assert(rate < 0.05, s"FPR $rate too high for 10 bits/element")
    assert(bf.expectedFpr < 0.02)
  }

  test("size is fixed by capacity, independent of insert count") {
    val bf = new BloomFilter(1000)
    val before = bf.sizeBytes
    (0 until 100000).foreach(i => bf.add(i.toLong))
    assert(bf.sizeBytes == before)
    assert(bf.inserted == 100000)
  }

  test("numBits is a positive multiple of 64") {
    for (cap <- Seq(1L, 7L, 64L, 1000L, 12345L)) {
      val bf = new BloomFilter(cap)
      assert(bf.numBits > 0 && bf.numBits % 64 == 0)
    }
  }

  test("numHashes is clamped to a sane range") {
    assert(new BloomFilter(10, 1).numHashes >= 1)
    assert(new BloomFilter(10, 100).numHashes <= 16)
    assert(new BloomFilter(10, 10).numHashes == 7) // ln(2)*10 ≈ 6.93 → 7
  }

  test("packVT is injective over the engine's (vertex, iteration) ranges") {
    val seen = collection.mutable.HashSet.empty[Long]
    for (v <- 0 until 500; i <- 0 until 40) {
      val k = BloomFilter.packVT(v, i)
      assert(seen.add(k), s"collision at ($v, $i)")
    }
  }

  test("empty filter contains nothing") {
    val bf = new BloomFilter(100)
    assert((0L until 1000L).forall(k => !bf.mightContain(k)))
  }

  test("rejects nonsensical construction") {
    intercept[IllegalArgumentException](new BloomFilter(0))
    intercept[IllegalArgumentException](new BloomFilter(10, 0))
  }
}
