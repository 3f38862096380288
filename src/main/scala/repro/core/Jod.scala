package repro.core

import scala.collection.mutable
import repro.graph.EdgeUpdate
import repro.util.{DiffList, MemoryModel}

/** DC^JOD with eager merging (paper §4–§5): the differential engine that
  * completely drops the Join operator's differences and keeps only
  * one-dimensional, positive-only differences for the aggregation output D.
  *
  * Representation (Appendix C):
  *  - per-node sorted list of (iteration, state) pairs ([[DiffList]]);
  *    iteration 0 (the initial state) is implicit and never stored;
  *  - the frontier is a per-iteration set of nodes whose aggregation must
  *    rerun;
  *  - the join input J^v_i is reconstructed on demand by reading each
  *    in-neighbour w's D^w_{i-1} (and the edge), exactly `spec.recompute`.
  *
  * Scheduling rules of DC^JOD (§4.1), adapted to the one-dimensional
  * timestamps eager merging guarantees (§4.2):
  *  - δE direct rule: an updated edge (u, v) schedules v (all its view
  *    nodes) at iteration 1;
  *  - δD direct rule: a change of v at iteration i schedules every
  *    out-neighbour of v at i+1;
  *  - upper-bound rule: scheduling v at i also schedules v at every j > i
  *    where v has a stored *or dropped* difference, and at j+1 for every
  *    j ≥ i-1... precisely, at jw+1 for every stored/dropped difference of
  *    an in-neighbour at jw ≥ i-1. False positives of the probabilistic
  *    DroppedVT only add spurious (harmless) reruns here.
  *
  * Partial dropping (§5) plugs in through `policy` (which differences to
  * drop) and `droppedVT` (how dropped VT pairs are remembered); access to a
  * dropped difference recomputes it recursively (AccessD_i^v WithDrops,
  * §5.1.1), with a per-batch memo table so cascades stay polynomial. The
  * `recomputeCount` counter reports each dropped-difference recomputation
  * (the Fig 6b metric).
  */
final class Jod(
    val spec: IFESpec,
    val policy: DropPolicy = DropPolicy.KeepAll,
    val droppedVT: DroppedVT = null,
) {
  import Queries.INF

  private val view = spec.view
  private val n = view.numNodes

  /** Per-node eager-merged positive differences for D. */
  private[repro] val diffs: Array[DiffList] = Array.fill(n)(new DiffList)

  /** Highest iteration with a stored or dropped difference. */
  var maxIterSeen: Int = 0

  // ---- counters for the paper's metrics ----
  var storedDiffCount: Long = 0L
  var droppedCount: Long = 0L
  /** Dropped-difference recomputations (paper Fig 6b). */
  var recomputeCount: Long = 0L
  /** Per-node recomputation counts (only filled when `trackPerNode`). */
  var trackPerNode: Boolean = false
  lazy val perNodeRecomputes: Array[Long] = new Array[Long](n)
  var totalDiffsWritten: Long = 0L

  // ---- per-batch transient state ----
  private var memo: mutable.LongMap[Double] = null
  private var frontier: mutable.LongMap[mutable.HashSet[Int]] = null // iter -> nodes
  private var scannedFrom: mutable.LongMap[Int] = null // node -> lowest i0 UB-scanned
  private var maxScheduled: Int = 0

  private val canDrop = droppedVT != null && (policy ne DropPolicy.KeepAll)
  private val iterCap: Int = spec.maxIters

  @inline private def key(node: Int, iter: Int): Long = (node.toLong << 20) | iter.toLong

  /** Bytes charged by the memory model: stored diffs + DroppedVT. */
  def memoryBytes: Long =
    storedDiffCount * MemoryModel.DiffBytes +
      (if (droppedVT == null) 0L else droppedVT.sizeBytes)

  // ------------------------------------------------------------------
  // AccessD_i^v WithDrops (§5.1)
  // ------------------------------------------------------------------

  /** The state of `node` at iteration `i` (clamped to the known horizon),
    * recomputing through dropped differences when necessary.
    */
  def access(node: Int, i: Int): Double = accessImpl(node, i)._1

  /** As `access`, but also reports whether the value was resolved through a
    * (possibly) dropped difference — in which case the pre-batch value is
    * unknowable and callers must treat the node as changed.
    */
  def accessDetailed(node: Int, i: Int): (Double, Boolean) = accessImpl(node, i)

  private def accessImpl(node: Int, i: Int): (Double, Boolean) = {
    if (i <= 0) return (spec.init(node), false)
    val dl = diffs(node)
    val gStar = dl.floorIter(i) // -1 if none; iteration 0 is implicit init
    val stored = if (gStar < 0) spec.init(node) else dl.exactValue(gStar)
    if (!canDrop) return (stored, false)
    val hi = math.min(i, maxIterSeen)
    val dStar = droppedVT.latestIn(node, math.max(gStar, 0), hi)
    if (dStar < 0) (stored, false)
    else (recomputeDropped(node, dStar), true)
  }

  /** Recompute the dropped difference for (node, d): rerun the aggregation
    * at iteration d from the in-neighbours' states at d-1 (which may
    * recursively hit further dropped differences — the cascade of §5.1.1).
    */
  private def recomputeDropped(node: Int, d: Int): Double = {
    val k = key(node, d)
    if (memo != null && memo.contains(k)) return memo(k)
    recomputeCount += 1
    if (trackPerNode) perNodeRecomputes(node) += 1
    val v = spec.recompute(node, w => access(w, d - 1))
    if (memo != null) memo(k) = v
    v
  }

  // ------------------------------------------------------------------
  // Scheduling (direct + upper-bound rules)
  // ------------------------------------------------------------------

  private def scheduleBasic(node: Int, i: Int): Unit = {
    if (i < 1 || i > iterCap) return
    frontier.getOrElseUpdate(i.toLong, mutable.HashSet.empty[Int]) += node
    if (i > maxScheduled) maxScheduled = i
  }

  /** Schedule node at i0 and apply the upper-bound rule: re-inspect every
    * later timestamp where the node itself or any in-neighbour has a stored
    * or dropped difference. This scan — reading in-neighbour state indexes
    * instead of materialized δJ — is exactly JOD's degree-proportional
    * overhead the paper measures in Fig 5.
    */
  private def scheduleWithUB(node: Int, i0: Int): Unit = {
    scheduleBasic(node, i0)
    val prev = scannedFrom.getOrElse(node.toLong, Int.MaxValue)
    if (i0 >= prev) return
    scannedFrom(node.toLong) = i0
    // (i) own stored/dropped differences at j > i0
    diffs(node).itersAbove(i0).foreach(j => scheduleBasic(node, j))
    if (canDrop)
      droppedVT.itersIn(node, i0, maxIterSeen).foreach(j => scheduleBasic(node, j))
    // (ii) in-neighbour differences at j ≥ i0-1 affect this node at j+1
    val it = view.inEdges(node)
    while (it.hasNext) {
      val (w, _, _) = it.next()
      diffs(w).itersAbove(i0 - 2).foreach(j => scheduleBasic(node, j + 1))
      if (canDrop)
        droppedVT.itersIn(w, i0 - 2, maxIterSeen).foreach(j => scheduleBasic(node, j + 1))
    }
  }

  // ------------------------------------------------------------------
  // Diff writes (with partial dropping)
  // ------------------------------------------------------------------

  private def writeDiff(node: Int, i: Int, value: Double): Unit = {
    totalDiffsWritten += 1
    if (memo != null) memo.remove(key(node, i))
    val degree = if (canDrop) view.policyDegree(node) else 0
    if (canDrop && policy.shouldDrop(node, i, degree)) {
      if (diffs(node).remove(i)) storedDiffCount -= 1
      droppedVT.add(node, i)
      droppedCount += 1
    } else {
      val before = diffs(node).size
      diffs(node).put(i, value)
      storedDiffCount += diffs(node).size - before
    }
    if (i > maxIterSeen) maxIterSeen = i
  }

  // ------------------------------------------------------------------
  // Initial computation and differential maintenance
  // ------------------------------------------------------------------

  /** Run the IFE computation on the initial graph, recording (and possibly
    * dropping) the per-level differences.
    */
  def initialRun(): Unit = {
    val res = ScratchEngine.run(spec, withTrace = true)
    memo = new mutable.LongMap[Double]()
    var i = 1
    while (i < res.trace.size) {
      res.trace(i).foreach { case (v, nv) => writeDiff(v, i, nv) }
      i += 1
    }
    memo = null
  }

  /** Differentially maintain the computation for one batch of edge updates.
    * The graph is mutated here; callers must not pre-apply the batch.
    */
  def applyBatch(batch: Seq[EdgeUpdate]): Unit = {
    memo = new mutable.LongMap[Double]()
    frontier = new mutable.LongMap[mutable.HashSet[Int]]()
    scannedFrom = new mutable.LongMap[Int]()
    maxScheduled = 0

    val seeds = mutable.HashSet.empty[Int]
    batch.foreach { u =>
      // PageRank: an edge at u changes u's out-degree, hence u's
      // contribution to *all* its out-neighbours (old and new).
      if (spec.edgeTouchesAllOutNeighbours)
        view.touchedSrcs(u.src, u.dst, u.label).foreach(s => seeds ++= view.outNodes(s))
      if (u.add) spec.view.graph.addEdge(u.src, u.dst, u.weight, u.label)
      else spec.view.graph.removeEdge(u.src, u.dst, u.weight, u.label)
      if (spec.edgeTouchesAllOutNeighbours)
        view.touchedSrcs(u.src, u.dst, u.label).foreach(s => seeds ++= view.outNodes(s))
      seeds ++= view.touchedDsts(u.src, u.dst, u.label)
    }
    seeds.foreach(v => scheduleWithUB(v, 1)) // δE direct rule + upper bounds

    var i = 1
    while (i <= maxScheduled && i <= iterCap) {
      val set = frontier.remove(i.toLong).orNull
      if (set != null) set.foreach { v =>
        val (old, viaDrop) = accessDetailed(v, i)
        val nv = spec.recompute(v, w => access(w, i - 1))
        // Change detection. For stored representations, compare against the
        // stored value. When the old value resolves through a dropped
        // record, the record is self-maintaining (access recomputes the
        // current value), but the *pre-batch* value is unknowable — so we
        // conservatively treat (v, i) as changed whenever a (possibly)
        // dropped record sits at exactly i (a pre-batch trace change that
        // may have moved), or the recomputed value differs from the
        // previous level (a new trace change at i that needs covering).
        // When neither holds, the change question reduces to the level of
        // the dropped record itself, which its own scheduling handles —
        // this is what keeps full-drop cascades from never quiescing.
        val changed =
          if (!viaDrop) !spec.same(nv, old)
          else (canDrop && droppedVT.latestIn(v, i - 1, i) == i) ||
            !spec.same(nv, access(v, i - 1))
        if (changed) {
          writeDiff(v, i, nv)
          // δD direct rule: out-neighbours rerun at the next iteration.
          view.outNodes(v).foreach(x => scheduleWithUB(x, i + 1))
        }
      }
      i += 1
    }
    memo = null; frontier = null; scannedFrom = null
  }

  /** Read-only view of a node's stored differences (iteration, state). */
  def diffEntries(node: Int): IndexedSeq[(Int, Double)] = diffs(node).entries

  /** Final states (at the current horizon) for every node. */
  def currentStates(): Array[Double] = {
    memo = new mutable.LongMap[Double]()
    val out = new Array[Double](n)
    var v = 0
    while (v < n) { out(v) = access(v, math.max(1, maxIterSeen)); v += 1 }
    memo = null
    out
  }
}
