package bench

import repro.SparkSpec
import repro.harness.Experiments

/** Table 1: SCRATCH vs differential computation as the number of SPSP
  * queries grows under a fixed difference-storage budget.
  *
  * Paper (Skitter, 100 x1 batches, 10 GB): SCRATCH 6.1K/13.6K/20.7K/28.3K s
  * for 10/20/30/40 queries; DC 0.2 s at 10 queries, OOM at 20+.
  * Expected shape: DC orders of magnitude faster where it fits, OOM beyond.
  */
class Table1Bench extends SparkSpec {

  test("Table 1: DC is far faster than SCRATCH but OOMs as queries grow") {
    val (table, facts) = Experiments.table1(spark)
    println(table.render)

    // DC completes at the smallest query count and is dramatically faster.
    assert(!facts.dcOom(10))
    assert(facts.scratchMs(10) > 20 * facts.dcMs(10),
      s"scratch=${facts.scratchMs(10)}ms dc=${facts.dcMs(10)}ms")
    // Beyond the budget, DC goes OOM — the scalability wall of Table 1.
    assert(facts.dcOom(20) && facts.dcOom(30) && facts.dcOom(40))
    // SCRATCH runtime keeps growing with the query count (per-source costs
    // vary with reachable-set size, so growth is monotone, not exactly 4x).
    assert(facts.scratchMs(40) > 1.5 * facts.scratchMs(10))
    assert(facts.scratchMs(40) > facts.scratchMs(20))
  }
}
