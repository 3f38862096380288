package repro.util

/** Deterministic byte accounting for the differences a configuration stores.
  *
  * The paper evaluates scalability as "how many concurrent queries fit in a
  * fixed difference-storage budget" (Table 1, Fig 7, Fig 8) on a real JVM
  * heap. Real OOM is nondeterministic, so we account bytes explicitly with
  * the same arithmetic the paper uses in §5.1.1: a difference is a
  * (vertex, timestamp) "VT pair" of d bytes plus a state of s bytes; a
  * deterministically-dropped difference still costs d bytes in DroppedVT,
  * hence the hard d/(d+s) limit of Det-Drop that Prob-Drop escapes.
  */
object MemoryModel {
  /** Bytes for a VT pair — 8 bytes, the packed key of Appendix C. */
  val VtBytes: Long = 8L

  /** Bytes for a state value (a double distance / rank / component id). */
  val StateBytes: Long = 8L

  /** A stored 1-D difference (JOD representation): VT pair + state. */
  val DiffBytes: Long = VtBytes + StateBytes

  /** A stored 2-D difference (VDC/DD): VT pair + extra version coordinate
    * + state + signed multiplicity byte, rounded to 8-byte alignment.
    */
  val Diff2dBytes: Long = VtBytes + 4L + StateBytes + 4L

  /** A Det-Drop DroppedVT entry: the VT pair alone. */
  val DroppedVtBytes: Long = VtBytes

  /** Scalability hard limit of Det-Drop at 100% dropping (paper §5.1.1):
    * memory shrinks at best by d/(d+s).
    */
  def detDropFloor: Double = DroppedVtBytes.toDouble / DiffBytes.toDouble
}
