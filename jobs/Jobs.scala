package jobs

import org.apache.spark.sql.SparkSession
import repro.harness.Experiments

/** Shared session bootstrap for the spark-submit entry points. */
object JobSession {
  def get(name: String): SparkSession = {
    val s = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    s.sparkContext.setLogLevel("ERROR")
    s
  }
}

/** Table 1: SCRATCH vs DC runtime/OOM vs number of SPSP queries.
  * spark-submit --class jobs.Table1Job repro.jar [nBatches]
  */
object Table1Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("table1")
    val nBatches = args.headOption.map(_.toInt).getOrElse(10)
    println(Experiments.table1(spark, nBatches)._1.render)
    spark.stop()
  }
}

/** Tables 3 & 4: the running-example difference traces (VDC 2-D trace and
  * JOD's eager-merged representation), printed for inspection.
  */
object Table3Job {
  def main(args: Array[String]): Unit = {
    import repro.core._
    import repro.core.RunningExample._
    val vdc = new Vdc(Queries.sssp(graph(), A), captureTrace = true)
    vdc.initialRun(); vdc.applyBatch(update1); vdc.applyBatch(update2)
    val names = "abcde"
    println("=== Table 3: full 2-D difference trace (G0..G2, iterations 0..4) ===")
    for (i <- 0 to 4; k <- 0 to 2) {
      val dj = vdc.jDiffsAt(k, i).map { case (v, x, m) => s"${if (m > 0) "+" else "-"}(${names(v)},$x)" }
      val dd = vdc.dDiffsAt(k, i).map { case (v, x, m) => s"${if (m > 0) "+" else "-"}(${names(v)},$x)" }
      if (dj.nonEmpty || dd.nonEmpty)
        println(f"t=<G$k,$i>  dJ=${dj.mkString(" ")}%-60s dD=${dd.mkString(" ")}")
    }
    println("\n=== Table 4: JOD eager-merged positive differences after G1 ===")
    val jod = new Jod(Queries.sssp(graph(), A))
    jod.initialRun(); jod.applyBatch(update1)
    for (v <- 0 until 5 if jod.diffEntries(v).nonEmpty)
      println(s"  ${names(v)}: ${jod.diffEntries(v).mkString(", ")}")
  }
}

/** Table 5: dataset stand-in statistics. */
object Table5Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("table5")
    println(Experiments.table5(spark).render)
    spark.stop()
  }
}

/** Fig 4: SCRATCH vs DD vs VDC vs JOD across datasets and queries. */
object Fig4Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("fig4")
    println(Experiments.fig4(spark)._1.render)
    spark.stop()
  }
}

/** Fig 5: VDC vs JOD as average degree grows. */
object Fig5Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("fig5")
    println(Experiments.fig5(spark)._1.render)
    spark.stop()
  }
}

/** Fig 6: Random vs Degree drop selection + recomputation-by-degree. */
object Fig6Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("fig6")
    val (a, _, b, _) = Experiments.fig6(spark)
    println(a.render); println(b.render)
    spark.stop()
  }
}

/** Fig 7: query scalability under a fixed memory budget. */
object Fig7Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("fig7")
    println(Experiments.fig7(spark)._1.render)
    spark.stop()
  }
}

/** Fig 8: PR and WCC under a tight budget (min feasible p). */
object Fig8Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("fig8")
    println(Experiments.fig8(spark)._1.render)
    spark.stop()
  }
}

/** Fig 9: Scratch vs Scratch-Landmark. */
object Fig9Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("fig9")
    println(Experiments.fig9(spark)._1.render)
    spark.stop()
  }
}

/** Fig 10: batch-size impact on the VDC/SCRATCH ratio. */
object Fig10Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("fig10")
    println(Experiments.fig10(spark)._1.render)
    spark.stop()
  }
}

/** Fig 12: deletion-ratio impact. */
object Fig12Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("fig12")
    println(Experiments.fig12(spark)._1.render)
    spark.stop()
  }
}

/** Distributed query-fleet demo: maintain many SPSP queries as Spark tasks. */
object FleetJob {
  def main(args: Array[String]): Unit = {
    import repro.core.Queries
    import repro.graph.Datasets
    import repro.spark.QueryFleet
    val spark = JobSession.get("fleet")
    val nQueries = args.headOption.map(_.toInt).getOrElse(8)
    val data = Datasets.load(spark, Datasets.sk(weighted = true))
    val batches = Datasets.batches(data.inserts.take(20), 1)
    val results = QueryFleet.run(spark, data.numVertices, data.initial, batches,
      (0 until nQueries).map(q => (q * 37) % data.numVertices),
      (g, s) => Queries.sssp(g, s))
    println(f"${"source"}%8s ${"init ms"}%10s ${"batches ms"}%12s ${"mem KB"}%10s ${"diffs"}%8s")
    results.foreach(r =>
      println(f"${r.source}%8d ${r.initialMs}%10.1f ${r.batchesMs}%12.1f ${r.memBytes / 1024.0}%10.1f ${r.storedDiffs}%8d"))
    spark.stop()
  }
}
