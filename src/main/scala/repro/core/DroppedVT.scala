package repro.core

import scala.collection.mutable
import repro.util.{BloomFilter, MemoryModel}

/** Storage for dropped (vertex, iteration) "VT pairs" — the Dropped
  * Difference Maintenance component of partial dropping (paper §5.1).
  *
  * Contract: `latestIn`/`itersIn` may over-report (false positives cause
  * only spurious recomputation) but must never under-report — a pair that
  * was `add`ed must always be found (no false negatives), otherwise
  * reassembled vertex states would silently be wrong.
  */
trait DroppedVT {
  /** Record that the difference for (node, iter) was dropped. */
  def add(node: Int, iter: Int): Unit

  /** Latest possibly-dropped iteration in (loExclusive, hiInclusive], or -1. */
  def latestIn(node: Int, loExclusive: Int, hiInclusive: Int): Int

  /** All possibly-dropped iterations in (loExclusive, hiInclusive], ascending. */
  def itersIn(node: Int, loExclusive: Int, hiInclusive: Int): Iterator[Int]

  /** Number of distinct logical drops recorded (for reporting). */
  def logicalCount: Long

  /** Bytes this structure is charged in the memory model. */
  def sizeBytes: Long
}

/** Det-Drop's DroppedVT (§5.1.1): a hash table keyed by vertex whose value
  * is a sorted list of dropped iterations, searched by binary search
  * (Appendix C). Exact, but costs [[MemoryModel.DroppedVtBytes]] per dropped
  * difference — the source of the d/(d+s) scalability floor.
  */
final class DetDroppedVT extends DroppedVT {
  private val table = mutable.HashMap.empty[Int, mutable.ArrayBuffer[Int]]
  private var n: Long = 0L

  def add(node: Int, iter: Int): Unit = {
    val list = table.getOrElseUpdate(node, mutable.ArrayBuffer.empty[Int])
    val idx = lowerBound(list, iter)
    if (idx < list.size && list(idx) == iter) return // duplicate drop of same VT
    list.insert(idx, iter)
    n += 1
  }

  /** First index with list(idx) >= key. */
  private def lowerBound(list: mutable.ArrayBuffer[Int], key: Int): Int = {
    var lo = 0; var hi = list.size
    while (lo < hi) {
      val mid = (lo + hi) >>> 1
      if (list(mid) < key) lo = mid + 1 else hi = mid
    }
    lo
  }

  def latestIn(node: Int, loExclusive: Int, hiInclusive: Int): Int =
    table.get(node) match {
      case None => -1
      case Some(list) =>
        val idx = lowerBound(list, hiInclusive + 1) - 1 // last <= hi
        if (idx >= 0 && list(idx) > loExclusive) list(idx) else -1
    }

  def itersIn(node: Int, loExclusive: Int, hiInclusive: Int): Iterator[Int] =
    table.get(node) match {
      case None => Iterator.empty
      case Some(list) =>
        val from = lowerBound(list, loExclusive + 1)
        list.iterator.drop(from).takeWhile(_ <= hiInclusive)
    }

  def logicalCount: Long = n
  def sizeBytes: Long = n * MemoryModel.DroppedVtBytes
}

/** Prob-Drop's DroppedVT (§5.1.2): a Bloom filter over packed 8-byte
  * (vertex, iteration) keys. Fixed size regardless of how many differences
  * are dropped; possibly-dropped iterations are found by probing each
  * candidate iteration from high to low.
  */
final class ProbDroppedVT(expectedDrops: Long, bitsPerElement: Int = 10) extends DroppedVT {
  val bloom = new BloomFilter(math.max(64L, expectedDrops), bitsPerElement)
  private var n: Long = 0L

  def add(node: Int, iter: Int): Unit = {
    bloom.add(BloomFilter.packVT(node, iter))
    n += 1
  }

  def latestIn(node: Int, loExclusive: Int, hiInclusive: Int): Int = {
    var d = hiInclusive
    while (d > loExclusive) {
      if (bloom.mightContain(BloomFilter.packVT(node, d))) return d
      d -= 1
    }
    -1
  }

  def itersIn(node: Int, loExclusive: Int, hiInclusive: Int): Iterator[Int] =
    ((loExclusive + 1) to hiInclusive).iterator
      .filter(d => bloom.mightContain(BloomFilter.packVT(node, d)))

  def logicalCount: Long = n
  def sizeBytes: Long = bloom.sizeBytes
}

/** Which differences to drop (paper §5.2). Deterministic in (node, iter,
  * seed) so runs are reproducible and the DuckDB/scratch oracles see the
  * same behaviour on every run.
  */
trait DropPolicy {
  /** Decide for the difference with VT pair (node, iter); `degree` is the
    * node's policy degree (total degree of its base vertex).
    */
  def shouldDrop(node: Int, iter: Int, degree: Int): Boolean
  def name: String
}

object DropPolicy {
  /** Deterministic pseudo-uniform draw in [0, 1) from (node, iter, seed). */
  private[core] def draw(node: Int, iter: Int, seed: Long): Double = {
    var z = (node.toLong << 21) ^ (iter.toLong << 1) ^ (seed * 0x9e3779b97f4a7c15L)
    z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
    z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
    z ^= z >>> 31
    (z >>> 11).toDouble / (1L << 53).toDouble
  }

  /** Drop nothing — plain JOD. */
  case object KeepAll extends DropPolicy {
    def shouldDrop(node: Int, iter: Int, degree: Int): Boolean = false
    def name = "keep-all"
  }

  /** Random: drop each difference with probability p (§5.2 baseline). */
  final case class Random(p: Double, seed: Long = 42L) extends DropPolicy {
    def shouldDrop(node: Int, iter: Int, degree: Int): Boolean = draw(node, iter, seed) < p
    def name = s"random(p=$p)"
  }

  /** Degree-based (§5.2.1, Fig 3): always drop below τ_min, never drop
    * above τ_max, otherwise drop with probability p. The paper sets
    * τ_min = 2 and τ_max = the 80th degree percentile.
    */
  final case class Degree(p: Double, tauMin: Int, tauMax: Int, seed: Long = 42L) extends DropPolicy {
    def shouldDrop(node: Int, iter: Int, degree: Int): Boolean =
      if (degree < tauMin) true
      else if (degree > tauMax) false
      else draw(node, iter, seed) < p
    def name = s"degree(p=$p,tauMin=$tauMin,tauMax=$tauMax)"
  }
}
