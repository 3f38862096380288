package bench

import repro.SparkSpec
import repro.harness.Experiments

/** Fig 5: VDC vs JOD as average degree grows. Paper shape: JOD competitive
  * or better at low degrees, VDC increasingly better as degree grows
  * (JOD's join-on-demand reconstruction reads all in-neighbours); the
  * average number of differences per vertex stays small and does not grow
  * with degree.
  */
class Fig5DegreeSweepBench extends SparkSpec {

  test("Fig 5: JOD's relative cost grows with average degree") {
    val (table, rows) = Experiments.fig5(spark)
    println(table.render)

    // JOD memory advantage holds at every degree.
    rows.foreach(r => assert(r.jodMem < r.vdcMem, s"deg ${r.avgDegree}"))

    // JOD's runtime relative to VDC degrades as the degree grows
    // (the paper's crossover): compare the lowest vs highest degree.
    val lo = rows.head; val hi = rows.last
    val loRatio = lo.jodMs / math.max(0.1, lo.vdcMs)
    val hiRatio = hi.jodMs / math.max(0.1, hi.vdcMs)
    assert(hiRatio > loRatio,
      s"expected JOD/VDC time ratio to grow with degree: lo=$loRatio hi=$hiRatio")

    // Differences per vertex stay small relative to degree and do not
    // explode as degree grows (paper: "remains small relative to the
    // average degree").
    rows.foreach(r => assert(r.diffsPerVertex < r.avgDegree || r.avgDegree < 8,
      s"deg ${r.avgDegree}: ${r.diffsPerVertex} diffs/vertex"))
    assert(rows.last.diffsPerVertex < 3 * rows.head.diffsPerVertex)
  }
}
