package bench

import repro.SparkSpec
import repro.harness.Experiments

/** Fig 9: SCRATCH vs SCRATCH-LANDMARK — differentially-maintained landmark
  * indices pruning a from-scratch SPSP. Paper: 43%-83% runtime reduction
  * across Skitter/LJ/Patents/Orkut.
  */
class Fig9LandmarkBench extends SparkSpec {

  test("Fig 9: landmark pruning beats plain scratch on most datasets") {
    val (table, rows) = Experiments.fig9(spark)
    println(table.render)

    // Landmark-pruned scratch wins overall...
    val totalScratch = rows.map(_.scratchMs).sum
    val totalLm = rows.map(_.landmarkMs).sum
    assert(totalLm < totalScratch,
      s"landmark total ${totalLm}ms should beat scratch total ${totalScratch}ms")
    // ...and on the majority of individual datasets.
    assert(rows.count(r => r.landmarkMs < r.scratchMs) >= 3,
      rows.map(r => s"${r.dataset}: ${r.improvementPct}%").mkString(", "))
  }
}
