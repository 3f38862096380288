package bench

import repro.SparkSpec
import repro.harness.Experiments

/** Fig 11/12 (Appendix B): workloads with deletions. Paper shape: the
  * relative ordering of JOD / Det-Drop / Prob-Drop is unchanged across
  * deletion ratios, and all configurations remain correct (the positive-
  * only eager-merged representation handles retractions).
  */
class Fig12DeletionsBench extends SparkSpec {

  test("Fig 12: deletion ratios change costs, never correctness or ordering") {
    val (table, rows) = Experiments.fig12(spark)
    println(table.render)

    // Every configuration stays correct at every deletion ratio.
    rows.foreach(r => assert(r.correct, s"${r.config} at ratio ${r.deleteRatio} is WRONG"))

    // JOD keeps its memory advantage over VDC at every deletion ratio.
    for (ratio <- Seq(0.0, 0.25, 0.5)) {
      val vdc = rows.find(r => r.deleteRatio == ratio && r.config == "VDC").get
      val jod = rows.find(r => r.deleteRatio == ratio && r.config == "JOD").get
      assert(jod.memBytes < vdc.memBytes, s"ratio $ratio")
    }
  }
}
