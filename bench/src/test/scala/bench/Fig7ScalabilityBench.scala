package bench

import repro.SparkSpec
import repro.harness.Experiments

/** Fig 7: how many concurrent queries fit in a fixed difference budget.
  *
  * Paper shape: JOD fits 2.3x-10x more queries than VDC; partial dropping
  * extends that up to 20x; Prob-Drop scales up to 1.5x beyond Det-Drop
  * (its DroppedVT stays flat); maintenance gets slower as p rises.
  */
class Fig7ScalabilityBench extends SparkSpec {

  test("Fig 7: JOD and partial dropping multiply the query capacity") {
    val (table, rows) = Experiments.fig7(spark)
    println(table.render)

    val vdc = rows.find(_.config == "VDC").get
    val jod = rows.find(_.config == "JOD").get
    val det = rows.filter(_.config == "DET-DROP")
    val prob = rows.filter(_.config == "PROB-DROP")

    // JOD fits several times more queries than VDC (paper: 2.3x-10x).
    assert(jod.maxQueries > 2 * vdc.maxQueries,
      s"jod=${jod.maxQueries} vdc=${vdc.maxQueries}")

    // Dropping monotonically shrinks the per-query footprint for Det-Drop.
    val detByP = det.sortBy(_.pUsed)
    assert(detByP.last.perQueryBytes < detByP.head.perQueryBytes)

    // At full dropping, Prob-Drop fits more queries than Det-Drop
    // (Det pays d bytes per dropped VT pair; the Bloom filter is flat).
    val det1 = det.find(_.pUsed == 1.0).get
    val prob1 = prob.find(_.pUsed == 1.0).get
    assert(prob1.maxQueries > det1.maxQueries,
      s"prob=${prob1.maxQueries} det=${det1.maxQueries}")

    // The best dropping configuration scales far beyond VDC (paper: up to 20x).
    val best = (det ++ prob).map(_.maxQueries).max
    assert(best > 5 * vdc.maxQueries, s"best=$best vdc=${vdc.maxQueries}")

    // Performance cost: maintaining with p=1 is slower than with p=0.
    val det0 = det.find(_.pUsed == 0.0).get
    assert(det1.batchMsPerQuery >= det0.batchMsPerQuery)
  }
}
