package repro.graph

import repro.SparkSpec

class SynthGraphsSpec extends SparkSpec {

  test("generators are deterministic in (params, seed)") {
    val a = SynthGraphs.collectEdges(SynthGraphs.edges(spark, 500, 2000, 1.2, weighted = true, 3, seed = 5))
    val b = SynthGraphs.collectEdges(SynthGraphs.edges(spark, 500, 2000, 1.2, weighted = true, 3, seed = 5))
    assert(a == b)
    val c = SynthGraphs.collectEdges(SynthGraphs.edges(spark, 500, 2000, 1.2, weighted = true, 3, seed = 6))
    assert(a != c)
  }

  test("edges respect vertex range, weight range, label range, no self-loops") {
    val edges = SynthGraphs.collectEdges(
      SynthGraphs.edges(spark, 300, 3000, 1.1, weighted = true, numLabels = 4))
    assert(edges.nonEmpty)
    edges.foreach { case (s, d, w, l) =>
      assert(s >= 0 && s < 300 && d >= 0 && d < 300 && s != d)
      assert(w >= 1 && w <= 10)
      assert(l >= 0 && l < 4)
    }
  }

  test("unweighted graphs use weight 1; unlabeled use label 0") {
    val edges = SynthGraphs.collectEdges(
      SynthGraphs.edges(spark, 100, 500, 1.2, weighted = false, numLabels = 1))
    assert(edges.forall(e => e._3 == 1 && e._4 == 0))
  }

  test("power-law skew concentrates degree on low vertex ids yet covers the tail") {
    val edges = SynthGraphs.collectEdges(
      SynthGraphs.edges(spark, 1000, 20000, 2.0, weighted = false))
    val g = DynamicGraph.fromEdges(1000, edges)
    val topDeg = (0 until 10).map(g.degree).sum
    val tailDeg = (500 until 510).map(g.degree).sum
    assert(topDeg > tailDeg * 5, s"expected heavy head: top=$topDeg tail=$tailDeg")
    // coverage: the overwhelming majority of vertices have at least one edge
    assert((0 until 1000).count(v => g.degree(v) > 0) > 950)
  }

  test("uniform (alpha <= 0) has no systematic head skew") {
    val edges = SynthGraphs.collectEdges(
      SynthGraphs.edges(spark, 1000, 20000, alpha = 0.0, weighted = false))
    val g = DynamicGraph.fromEdges(1000, edges)
    val head = (0 until 100).map(g.degree).sum
    val mid = (450 until 550).map(g.degree).sum
    assert(head < mid * 2 && mid < head * 2)
  }

  test("densify adds approximately the requested number of edges") {
    val base = SynthGraphs.edges(spark, 200, 1000, 1.2, weighted = false)
    val n0 = base.count()
    val dense = SynthGraphs.densify(spark, base, 200, 5000, weighted = false)
    val n1 = dense.count()
    assert(n1 == n0 + 5000)
  }

  test("stats DataFrame agrees with locally computed statistics") {
    val df = SynthGraphs.edges(spark, 400, 4000, 1.2, weighted = false)
    val edges = SynthGraphs.collectEdges(df)
    val g = DynamicGraph.fromEdges(400, edges)
    val row = SynthGraphs.stats(spark, df).collect()(0)
    assert(row.getLong(0) == edges.size)
    val touched = (0 until 400).count(v => g.degree(v) > 0)
    assert(row.getLong(1) == touched)
    assert(row.getLong(2) == (0 until 400).map(g.degree).max)
    val avgOut = edges.size.toDouble / touched
    assert(math.abs(row.getDouble(3) - avgOut) < 0.11) // rounded to 1 decimal
  }

  test("Catalyst degree percentile tracks the exact percentile") {
    val df = SynthGraphs.edges(spark, 500, 8000, 1.2, weighted = false)
    val g = DynamicGraph.fromEdges(500, SynthGraphs.collectEdges(df))
    val approx = SynthGraphs.degreePercentile(spark, df, 80)
    // exact percentile over vertices *with* edges
    val degs = (0 until 500).map(g.degree).filter(_ > 0).sorted
    val exact = degs((0.8 * degs.size).toInt.min(degs.size - 1))
    assert(math.abs(approx - exact) <= math.max(2, exact / 2), s"approx=$approx exact=$exact")
  }
}

class DatasetsSpec extends SparkSpec {

  test("load splits 90/10 into initial graph and insert stream") {
    val data = Datasets.load(spark, Datasets.sk())
    val total = data.initial.size + data.inserts.size
    assert(math.abs(data.initial.size - 0.9 * total) <= 1)
    assert(data.inserts.forall(_.add))
    assert(data.numVertices == Datasets.sk().numVertices)
  }

  test("each dataset stand-in hits its target average degree direction") {
    // Orkut-lite must be denser than Patents-lite by construction.
    val orkut = Datasets.load(spark, Datasets.orkut())
    val patents = Datasets.load(spark, Datasets.patents())
    val dOrkut = orkut.initial.size.toDouble / orkut.numVertices
    val dPatents = patents.initial.size.toDouble / patents.numVertices
    assert(dOrkut > 3 * dPatents, s"orkut=$dOrkut patents=$dPatents")
  }

  test("ldbc stand-in carries all four labels") {
    val data = Datasets.load(spark, Datasets.ldbc())
    val labels = data.initial.map(_._4).toSet
    assert(labels == Set(Datasets.Knows, Datasets.ReplyOf, Datasets.Likes, Datasets.HasCreator))
  }

  test("withDeletions hits the requested ratio and deletes real edges") {
    val data = Datasets.load(spark, Datasets.patents())
    for (ratio <- Seq(0.0, 0.25, 0.5, 1.0)) {
      val ups = Datasets.withDeletions(data, ratio)
      val nDel = ups.count(!_.add)
      assert(math.abs(nDel - ratio * data.inserts.size) <= 1, s"ratio $ratio -> $nDel")
      // deletions must refer to edges present in the initial graph
      val initialSet = data.initial.toSet
      ups.filter(!_.add).foreach(u =>
        assert(initialSet((u.src, u.dst, u.weight, u.label))))
      // applying the whole stream to the initial graph must succeed
      val g = data.graph()
      g.apply(ups)
      assert(g.numEdges == data.initial.size - nDel + ups.count(_.add))
    }
  }

  test("batches chunking") {
    val data = Datasets.load(spark, Datasets.patents())
    val bs = Datasets.batches(data.inserts.take(10), 3)
    assert(bs.map(_.size) == Seq(3, 3, 3, 1))
  }

  test("deterministic loads: same config, same data") {
    val a = Datasets.load(spark, Datasets.lj())
    val b = Datasets.load(spark, Datasets.lj())
    assert(a.initial == b.initial && a.inserts == b.inserts)
  }
}
