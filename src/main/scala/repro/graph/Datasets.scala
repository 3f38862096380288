package repro.graph

import org.apache.spark.sql.SparkSession

/** Laptop-scale synthetic stand-ins for the paper's datasets (Table 5).
  * Each config targets the *shape* that drives the experiments — average
  * degree and degree skew — at ~1000× smaller size (see DESIGN.md
  * substitutions). `ScaleEnv` (env REPRO_GRAPH_SCALE) scales every dataset
  * up or down uniformly.
  */
object Datasets {
  /** Labels of the LDBC SNB stand-in (§6.1.2 uses these four). */
  val Knows: Byte = 0
  val ReplyOf: Byte = 1
  val Likes: Byte = 2
  val HasCreator: Byte = 3

  private val scale: Double = sys.env.get("REPRO_GRAPH_SCALE").map(_.toDouble).getOrElse(1.0)
  private def s(x: Int): Int = math.max(16, (x * scale).toInt)
  private def sl(x: Long): Long = math.max(64L, (x * scale).toLong)

  /** Generator parameters for one dataset stand-in.
    * `symmetric` emits every generated edge in both directions (Skitter and
    * Orkut are undirected graphs in SNAP; hubs then have high out-degree as
    * well — which is what makes their differences hot, Fig 6b).
    */
  final case class Config(name: String, paperName: String, numVertices: Int, numEdges: Long,
                          alpha: Double, weighted: Boolean, numLabels: Int, seed: Long,
                          symmetric: Boolean = false)

  /** Skitter: internet topology, avg degree 8.2, strong hubs, undirected. */
  def sk(weighted: Boolean = false): Config =
    Config("SK-lite", "Skitter", s(4000), sl(33000), 2.2, weighted, 1, 101L, symmetric = true)

  /** LiveJournal: social, power-law, avg degree 8.5. */
  def lj(weighted: Boolean = false): Config =
    Config("LJ-lite", "LiveJournal", s(6000), sl(51000), 2.0, weighted, 1, 102L)

  /** Patents: citation graph, sparse (avg degree 2.3), mild skew. */
  def patents(weighted: Boolean = false): Config =
    Config("Patents-lite", "Patents", s(6000), sl(14000), 1.4, weighted, 1, 103L)

  /** Orkut: dense social graph, avg degree 17.7, undirected. */
  def orkut(weighted: Boolean = false): Config =
    Config("Orkut-lite", "Orkut", s(3000), sl(53000), 2.0, weighted, 1, 104L, symmetric = true)

  /** LDBC SNB SF10 stand-in with the four labels used by the RPQ templates. */
  def ldbc(): Config =
    Config("LDBC-lite", "LDBC SNB", s(5000), sl(36000), 1.8, weighted = false, numLabels = 4, 105L)

  /** A generated dynamic dataset: 90% of edges loaded initially, the last
    * 10% form the insertion stream (paper §6.1: "we shuffle the edges, and
    * split the dataset such that 90% of the data is used as an initial
    * graph, while the remaining 10% models the dynamism").
    */
  final case class DynData(name: String, numVertices: Int,
                           initial: Vector[(Int, Int, Int, Byte)],
                           inserts: Vector[EdgeUpdate]) {
    def graph(): DynamicGraph = DynamicGraph.fromEdges(numVertices, initial)
  }

  /** Generate a dataset through the Spark generators and split 90/10. */
  def load(spark: SparkSession, cfg: Config): DynData = {
    val genEdges = if (cfg.symmetric) cfg.numEdges / 2 else cfg.numEdges
    val df = SynthGraphs.edges(spark, cfg.numVertices, genEdges, cfg.alpha,
      cfg.weighted, cfg.numLabels, cfg.seed)
    val raw = SynthGraphs.collectEdges(df)
    val all = if (cfg.symmetric) raw.flatMap(e => Seq(e, (e._2, e._1, e._3, e._4))) else raw
    // Deterministic shuffle: order by a hash of (index, tuple).
    val shuffled = all.zipWithIndex
      .sortBy { case (e, i) => DropPolicyHash.mix(i.toLong * 31 + e._1 * 7 + e._2, cfg.seed) }
      .map(_._1)
    val cut = (shuffled.size * 0.9).toInt
    DynData(cfg.name, cfg.numVertices, shuffled.take(cut),
      shuffled.drop(cut).map { case (s, d, w, l) => EdgeUpdate(s, d, w, l, add = true) })
  }

  /** Replace a fraction of the insert stream with deletions of edges present
    * in the initial graph (Appendix B workloads). Deterministic in `seed`.
    */
  def withDeletions(data: DynData, deleteRatio: Double, seed: Long = 7L): Vector[EdgeUpdate] = {
    require(deleteRatio >= 0 && deleteRatio <= 1)
    val nDel = (data.inserts.size * deleteRatio).toInt
    // Pick distinct initial edges to delete, spread deterministically.
    val picks = data.initial.indices
      .sortBy(i => DropPolicyHash.mix(i.toLong, seed))
      .take(nDel)
      .map(data.initial)
      .map { case (s, d, w, l) => EdgeUpdate(s, d, w, l, add = false) }
    // Interleave deletions proportionally through the stream.
    val inserts = data.inserts.take(data.inserts.size - nDel)
    val total = inserts.size + picks.size
    val out = Vector.newBuilder[EdgeUpdate]
    var ii = 0; var di = 0
    for (k <- 0 until total) {
      val dueDeletes = ((k + 1).toLong * picks.size) / total
      if (di < dueDeletes && di < picks.size) { out += picks(di); di += 1 }
      else if (ii < inserts.size) { out += inserts(ii); ii += 1 }
      else { out += picks(di); di += 1 }
    }
    out.result()
  }

  /** Chunk an update stream into batches of `batchSize` (default 1, §6.1). */
  def batches(updates: Seq[EdgeUpdate], batchSize: Int): Seq[Seq[EdgeUpdate]] =
    updates.grouped(batchSize).toSeq
}

/** Small deterministic mixer shared by dataset shuffling. */
private[graph] object DropPolicyHash {
  def mix(x: Long, seed: Long): Long = {
    var z = x + seed * 0x9e3779b97f4a7c15L
    z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
    z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
    z ^ (z >>> 31)
  }
}
