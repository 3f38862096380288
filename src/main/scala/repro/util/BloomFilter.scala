package repro.util

/** A classic Bloom filter [Bloom 1970] over 64-bit keys, built from scratch
  * (the paper uses lemire/bloofi; no external library is available offline).
  *
  * Guarantees no false negatives — the property Prob-Drop (paper §5.1.2)
  * depends on: a dropped (vertex, iteration) pair must always be found,
  * while false positives only cause spurious, harmless recomputation.
  *
  * The k hash functions are derived with the Kirsch–Mitzenmacher scheme
  * h_i(x) = h1(x) + i * h2(x), where h1/h2 are two independent 64-bit
  * finalizer mixes (splitmix64-style).
  *
  * @param expectedInsertions capacity the filter is sized for
  * @param bitsPerElement     bits allocated per expected insertion
  *                           (10 bits/elem ≈ 1% FPR with k = 7)
  */
final class BloomFilter(val expectedInsertions: Long, val bitsPerElement: Int = 10) {
  require(expectedInsertions > 0, "expectedInsertions must be positive")
  require(bitsPerElement > 0, "bitsPerElement must be positive")

  /** Number of bits, rounded up to a multiple of 64, at least 64. */
  val numBits: Long = {
    val raw = math.max(64L, expectedInsertions * bitsPerElement.toLong)
    (raw + 63L) & ~63L
  }

  /** Optimal number of hash functions k = ln(2) * bits/elem, clamped to [1, 16]. */
  val numHashes: Int = math.max(1, math.min(16, math.round(bitsPerElement * 0.6931472).toInt))

  private val words = new Array[Long]((numBits / 64L).toInt)
  private var nInserted: Long = 0L

  /** Number of add() calls so far (duplicates counted). */
  def inserted: Long = nInserted

  /** Bytes occupied by the bit array — the quantity Prob-Drop's memory
    * accounting charges (paper §5.1.2: the size does not grow with the
    * number of dropped differences).
    */
  def sizeBytes: Long = numBits / 8L

  private def mix1(x: Long): Long = {
    var z = x + 0x9e3779b97f4a7c15L
    z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
    z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
    z ^ (z >>> 31)
  }

  private def mix2(x: Long): Long = {
    var z = x + 0xc2b2ae3d27d4eb4fL
    z = (z ^ (z >>> 33)) * 0xff51afd7ed558ccdL
    z = (z ^ (z >>> 33)) * 0xc4ceb9fe1a85ec53L
    z ^ (z >>> 33)
  }

  private def setBit(idx: Long): Unit = {
    val w = (idx >>> 6).toInt
    words(w) |= (1L << (idx & 63L))
  }

  private def getBit(idx: Long): Boolean = {
    val w = (idx >>> 6).toInt
    (words(w) & (1L << (idx & 63L))) != 0L
  }

  /** Insert a 64-bit key. */
  def add(key: Long): Unit = {
    val h1 = mix1(key)
    val h2 = mix2(key) | 1L // odd stride so probes cover the bit space
    var i = 0
    while (i < numHashes) {
      val bit = java.lang.Long.remainderUnsigned(h1 + i.toLong * h2, numBits)
      setBit(bit)
      i += 1
    }
    nInserted += 1
  }

  /** True if the key may have been inserted; false means definitely not. */
  def mightContain(key: Long): Boolean = {
    val h1 = mix1(key)
    val h2 = mix2(key) | 1L
    var i = 0
    while (i < numHashes) {
      val bit = java.lang.Long.remainderUnsigned(h1 + i.toLong * h2, numBits)
      if (!getBit(bit)) return false
      i += 1
    }
    true
  }

  /** Expected false-positive rate at the current fill level:
    * (1 - e^{-kn/m})^k.
    */
  def expectedFpr: Double = {
    val k = numHashes.toDouble
    val n = nInserted.toDouble
    val m = numBits.toDouble
    math.pow(1.0 - math.exp(-k * n / m), k)
  }
}

object BloomFilter {
  /** Pack a (vertex, iteration) pair into the 8-byte key the paper's
    * Appendix C describes ("constructed by concatenating vertex-id and
    * iteration number together using binary operations"). Iterations fit
    * comfortably in 20 bits (IFE converges in <= |V| levels; our graphs
    * keep iterations far below 2^20).
    */
  def packVT(vertex: Int, iteration: Int): Long =
    (vertex.toLong << 20) | (iteration.toLong & 0xfffffL)
}
