package repro.core

import scala.util.Random
import repro.{Oracle, SparkSpec}
import repro.graph._

/** Static query results checked against DuckDB recursive CTEs over the same
  * edge tables — an implementation-independent oracle for SSSP, K-hop, WCC
  * and RPQ (PageRank is covered by the dense-power-iteration reference in
  * ScratchEngineSpec; it is not expressible as a recursive CTE).
  */
class QueriesOracleSpec extends SparkSpec {
  import Queries.INF

  private def randomGraph(seed: Int, nV: Int, nE: Int, weighted: Boolean, labels: Int = 1): DynamicGraph = {
    val rnd = new Random(seed)
    val g = new DynamicGraph(nV)
    (0 until nE).foreach { _ =>
      val s = rnd.nextInt(nV); var d = rnd.nextInt(nV); if (d == s) d = (d + 1) % nV
      g.addEdge(s, d, if (weighted) 1 + rnd.nextInt(10) else 1, rnd.nextInt(labels).toByte)
    }
    g
  }

  private def edgesDf(g: DynamicGraph) = {
    val s = spark
    import s.implicits._
    g.edgeList.map { case (a, b, w, l) => (a, b, w, l.toInt) }.toDF("src", "dst", "weight", "label")
  }

  test("SSSP distances match a DuckDB recursive CTE") {
    for (seed <- 1 to 3) {
      val g = randomGraph(seed, 30, 80, weighted = true)
      val states = ScratchEngine.states(Queries.sssp(g, 0))
      val s = spark
      import s.implicits._
      val result = states.zipWithIndex.collect { case (d, v) if d != INF => (v, d) }
        .toSeq.toDF("v", "dist")
      Oracle.assertEquivalent(result,
        s"""
        WITH RECURSIVE e AS (
          SELECT CAST(src AS INT) AS s, CAST(dst AS INT) AS d, CAST(weight AS INT) AS w FROM edges
        ), sp(v, dd) AS (
          SELECT 0, 0
          UNION
          SELECT e.d, sp.dd + e.w FROM sp, e WHERE e.s = sp.v AND sp.dd + e.w <= 300
        )
        SELECT v, CAST(MIN(dd) AS DOUBLE) AS dist FROM sp GROUP BY v
        """,
        "edges" -> edgesDf(g))
    }
  }

  test("K-hop results match a DuckDB recursive CTE") {
    for (seed <- 1 to 3; k <- Seq(2, 5)) {
      val g = randomGraph(seed + 10, 35, 90, weighted = false)
      val states = ScratchEngine.states(Queries.khop(g, 0, k))
      val s = spark
      import s.implicits._
      val result = states.zipWithIndex.collect { case (d, v) if d != INF => (v, d) }
        .toSeq.toDF("v", "dist")
      Oracle.assertEquivalent(result,
        s"""
        WITH RECURSIVE e AS (
          SELECT CAST(src AS INT) AS s, CAST(dst AS INT) AS d FROM edges
        ), r(v, dd) AS (
          SELECT 0, 0
          UNION
          SELECT e.d, r.dd + 1 FROM r, e WHERE e.s = r.v AND r.dd + 1 <= $k
        )
        SELECT v, CAST(MIN(dd) AS DOUBLE) AS dist FROM r GROUP BY v
        """,
        "edges" -> edgesDf(g))
    }
  }

  test("WCC components match a DuckDB recursive CTE") {
    for (seed <- 1 to 3) {
      val g = randomGraph(seed + 20, 40, 45, weighted = false)
      val states = ScratchEngine.states(Queries.wcc(g))
      val inEdges = (0 until g.numVertices).filter(v => g.degree(v) > 0).toSet
      val s = spark
      import s.implicits._
      val result = states.zipWithIndex.collect { case (c, v) if inEdges(v) => (v, c) }
        .toSeq.toDF("v", "comp")
      Oracle.assertEquivalent(result,
        """
        WITH RECURSIVE e0 AS (
          SELECT CAST(src AS INT) AS s, CAST(dst AS INT) AS d FROM edges
        ), u AS (
          SELECT s, d FROM e0 UNION SELECT d, s FROM e0
        ), verts AS (
          SELECT DISTINCT s AS v FROM u
        ), c(v, id) AS (
          SELECT v, v FROM verts
          UNION
          SELECT u.d, c.id FROM c, u WHERE u.s = c.v
        )
        SELECT v, CAST(MIN(id) AS DOUBLE) AS comp FROM c GROUP BY v
        """,
        "edges" -> edgesDf(g))
    }
  }

  test("RPQ matches across DuckDB product-construction reachability") {
    val templates = Seq(
      ("q1", Automaton.q1(0)),
      ("q2", Automaton.q2(0, 1)),
      ("q3", Automaton.q3(Seq(0, 1, 2, 0, 1))))
    for (seed <- 1 to 2; (name, m) <- templates) {
      val g = randomGraph(seed + 30, 25, 70, weighted = false, labels = 3)
      val spec = Queries.rpq(g, 0, m)
      val states = ScratchEngine.states(spec)
      val pv = spec.view.asInstanceOf[ProductView]
      val s = spark
      import s.implicits._
      val result = (0 until g.numVertices)
        .filter(v => m.accepting.exists(q => states(pv.nodeOf(v, q)) != INF))
        .map(Tuple1(_)).toDF("v")
      val trans = m.transitions.map { case (f, l, t) => (f, l.toInt, t) }.toDF("qf", "lbl", "qt")
      val acc = m.accepting.toSeq.map(Tuple1(_)).toDF("q")
      Oracle.assertEquivalent(result,
        """
        WITH RECURSIVE e AS (
          SELECT CAST(src AS INT) AS s, CAST(dst AS INT) AS d, CAST(label AS INT) AS l FROM edges
        ), t AS (
          SELECT CAST(qf AS INT) AS qf, CAST(lbl AS INT) AS l, CAST(qt AS INT) AS qt FROM trans
        ), pr(v, q) AS (
          SELECT 0, 0
          UNION
          SELECT e.d, t.qt FROM pr, e, t WHERE e.s = pr.v AND t.qf = pr.q AND t.l = e.l
        )
        SELECT DISTINCT pr.v AS v FROM pr JOIN acc ON CAST(acc.q AS INT) = pr.q
        """,
        "edges" -> edgesDf(g), "trans" -> trans, "acc" -> acc)
    }
  }

  test("maintained JOD results stay oracle-correct after updates") {
    val g = randomGraph(99, 25, 60, weighted = true)
    val jod = new Jod(Queries.sssp(g, 0))
    jod.initialRun()
    val rnd = new Random(7)
    val ups = Vector.fill(8) {
      val a = rnd.nextInt(25); var b = rnd.nextInt(25); if (b == a) b = (b + 1) % 25
      EdgeUpdate(a, b, 1 + rnd.nextInt(10), 0, add = true)
    }
    ups.grouped(2).foreach(b => jod.applyBatch(b))
    val states = jod.currentStates()
    val s = spark
    import s.implicits._
    val result = states.zipWithIndex.collect { case (d, v) if d != INF => (v, d) }
      .toSeq.toDF("v", "dist")
    Oracle.assertEquivalent(result,
      """
      WITH RECURSIVE e AS (
        SELECT CAST(src AS INT) AS s, CAST(dst AS INT) AS d, CAST(weight AS INT) AS w FROM edges
      ), sp(v, dd) AS (
        SELECT 0, 0
        UNION
        SELECT e.d, sp.dd + e.w FROM sp, e WHERE e.s = sp.v AND sp.dd + e.w <= 250
      )
      SELECT v, CAST(MIN(dd) AS DOUBLE) AS dist FROM sp GROUP BY v
      """,
      "edges" -> edgesDf(g))
  }
}
