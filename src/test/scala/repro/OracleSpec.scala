package repro

/** The DuckDB oracle must catch wrong results, not just bless everything,
  * and the provided TPC-H-lite generators must satisfy it on real
  * aggregations (scaffold sanity: SynthData + Oracle work end to end).
  */
class OracleSpec extends SparkSpec {

  test("assertEquivalent passes on a matching aggregate") {
    val s = spark
    import s.implicits._
    val li = SynthData.lineitem(spark, sf = 0.001)
    val agg = li.groupBy("l_returnflag")
      .agg(org.apache.spark.sql.functions.count("*") as "cnt")
      .select($"l_returnflag", $"cnt")
    Oracle.assertEquivalent(agg,
      "SELECT l_returnflag, COUNT(*) AS cnt FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li)
  }

  test("assertEquivalent catches a wrong result") {
    val s = spark
    import s.implicits._
    val li = SynthData.lineitem(spark, sf = 0.001)
    val wrong = li.groupBy("l_returnflag")
      .agg((org.apache.spark.sql.functions.count("*") + 1) as "cnt")
      .select($"l_returnflag", $"cnt")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong,
        "SELECT l_returnflag, COUNT(*) AS cnt FROM lineitem GROUP BY l_returnflag",
        "lineitem" -> li)
    }
  }

  test("assertEquivalent rejects mismatched column sets") {
    val s = spark
    import s.implicits._
    val df = Seq((1, 2)).toDF("a", "b")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(df, "SELECT CAST(a AS INT) AS a FROM t", "t" -> df)
    }
  }

  test("TPC-H-lite generators are deterministic and join-compatible") {
    val s = spark
    import s.implicits._
    val o1 = SynthData.orders(spark, sf = 0.001).agg(org.apache.spark.sql.functions.sum("o_orderkey")).collect()(0).getLong(0)
    val o2 = SynthData.orders(spark, sf = 0.001).agg(org.apache.spark.sql.functions.sum("o_orderkey")).collect()(0).getLong(0)
    assert(o1 == o2)
    // lineitem orderkeys all resolve against orders (FK synthesis holds)
    val li = SynthData.lineitem(spark, sf = 0.001)
    val orders = SynthData.orders(spark, sf = 0.001)
    val dangling = li.join(orders, li("l_orderkey") === orders("o_orderkey"), "left_anti").count()
    assert(dangling == 0, s"$dangling lineitem rows without orders")
  }

  test("join + aggregate against the oracle (customer x orders)") {
    val s = spark
    import s.implicits._
    val orders = SynthData.orders(spark, sf = 0.001)
    val customer = SynthData.customer(spark, sf = 0.001)
    val q = customer.join(orders, customer("c_custkey") === orders("o_custkey"))
      .groupBy("c_mktsegment")
      .agg(org.apache.spark.sql.functions.count("*") as "cnt")
      .select($"c_mktsegment", $"cnt")
    Oracle.assertEquivalent(q,
      """SELECT c_mktsegment, COUNT(*) AS cnt
         FROM customer JOIN orders ON CAST(c_custkey AS INT) = CAST(o_custkey AS INT)
         GROUP BY c_mktsegment""",
      "customer" -> customer, "orders" -> orders)
  }
}
