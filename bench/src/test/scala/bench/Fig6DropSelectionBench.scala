package bench

import repro.SparkSpec
import repro.harness.Experiments

/** Fig 6: Random vs Degree-based drop selection.
  *
  * Paper shape: (a) dropping more differences slows maintenance for every
  * configuration; Degree selection is 3-5 orders of magnitude faster than
  * Random at the same dropped-difference count. (b) recomputations per
  * vertex grow steeply with vertex degree (power-law graphs), which is why
  * dropping low-degree vertices' differences is nearly free.
  */
class Fig6DropSelectionBench extends SparkSpec {

  test("Fig 6a/6b: Degree-based selection beats Random; recomputations follow degree") {
    val (t6a, rows, t6b, buckets) = Experiments.fig6(spark)
    println(t6a.render)
    println(t6b.render)

    def total(config: String => Boolean, p: Double): (Long, Double) = {
      val rs = rows.filter(r => config(r.config) && r.p == p)
      (rs.map(_.recomputes).sum, rs.map(_.batchesMs).sum)
    }
    // At the same p, Degree selection strictly beats Random...
    for (p <- Seq(0.2, 0.8)) {
      val (randRe, randMs) = total(_.contains("random"), p)
      val (degRe, degMs) = total(_.contains("degree"), p)
      assert(degRe < randRe && degMs < randMs,
        s"p=$p: degree ($degRe re, $degMs ms) should beat random ($randRe re, $randMs ms)")
    }
    // ...and by a wide margin at high p, where most differences are dropped
    // (the paper's orders-of-magnitude regime).
    val (randRe8, randMs8) = total(_.contains("random"), 0.8)
    val (degRe8, degMs8) = total(_.contains("degree"), 0.8)
    assert(degRe8 * 3 < randRe8 || degMs8 * 2 < randMs8,
      s"p=0.8: degree ($degRe8 re, $degMs8 ms) vs random ($randRe8 re, $randMs8 ms)")
    // More dropping means more recomputation within each selection policy.
    val randLow = total(_.contains("random"), 0.2)
    val randHigh = total(_.contains("random"), 0.8)
    assert(randHigh._1 >= randLow._1)

    // Fig 6b: high-degree buckets recompute far more per vertex than
    // low-degree buckets, and the degree distribution is power-law
    // (many low-degree vertices, few hubs).
    val nonEmpty = buckets.filter(_._3 > 0)
    assert(nonEmpty.size >= 2)
    val lowBucket = nonEmpty.head
    val highBucket = nonEmpty.last
    assert(highBucket._2 > 2 * math.max(0.05, lowBucket._2),
      s"high-degree avg ${highBucket._2} should exceed low-degree avg ${lowBucket._2}")
    assert(lowBucket._3 > highBucket._3, "power-law: many more low-degree vertices than hubs")
  }
}
