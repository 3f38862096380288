package bench

import repro.SparkSpec
import repro.harness.Experiments

/** Fig 10 (Appendix A): the VDC/SCRATCH per-batch time ratio vs batch size.
  * Paper shape: tiny batches favour DC by orders of magnitude; the ratio
  * grows with batch size (crossing 1 above ~100K updates/batch on Skitter).
  */
class Fig10BatchSizeBench extends SparkSpec {

  test("Fig 10: DC's advantage shrinks as the batch size grows") {
    val (table, rows) = Experiments.fig10(spark)
    println(table.render)

    val byBs = rows.sortBy(_.batchSize)
    // DC is much faster than scratch at batch size 1.
    assert(byBs.head.ratio < 0.5, s"bs=1 ratio ${byBs.head.ratio}")
    // The ratio grows with the batch size (paper's monotone trend).
    assert(byBs.last.ratio > 2 * byBs.head.ratio,
      byBs.map(r => s"${r.batchSize}->${r.ratio}").mkString(", "))
  }
}
