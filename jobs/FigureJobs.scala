package repro.jobs

import repro.bench._
import repro.bench.BenchUtil._

/** Spark-submit entrypoints, one per evaluation figure. The micro-bench
  * figures are driver-side algorithm benchmarks (like the paper's C++
  * harness); Fig 17 spins up Structured Streaming. Each prints the same
  * table its bench/test counterpart prints.
  *
  *   spark-submit --class repro.jobs.Fig07EvictLatency target/scala-2.13/repro_2.13-*.jar
  */
private object JobCommon {
  def latencyTable(title: String, rows: Seq[Seq[String]]): Unit =
    println(table(title, Seq("monoid", "algo", "mean", "p50", "p99.9", "max"), rows))
}

object Fig07EvictLatency {
  def main(args: Array[String]): Unit = {
    val (n, m, rounds) = (benchN, 1024, scaled(200))
    val rows = Vector.newBuilder[Seq[String]]
    MonoidCases.forEach { mc =>
      for (mk <- Algos.all(mc.monoid)) {
        val st = LatencyBench.bulkEvictLatency(mk, mc.lift, n, m, rounds)
        rows += Seq(mc.name, mk().name, f"${st.meanNs / 1e3}%.2f", f"${st.p50Ns / 1e3}%.2f",
                    f"${st.p999Ns / 1e3}%.2f", f"${st.maxNs / 1e3}%.2f")
      }
    }
    JobCommon.latencyTable(s"Figure 7: bulk-evict latency (us), n=$n m=$m d=0", rows.result())
  }
}

object Fig08InsertLatency {
  def main(args: Array[String]): Unit = {
    val (n, m, rounds) = (benchN, 1024, scaled(200))
    val rows = Vector.newBuilder[Seq[String]]
    MonoidCases.forEach { mc =>
      for (mk <- Algos.all(mc.monoid)) {
        val st = LatencyBench.bulkInsertLatency(mk, mc.lift, n, m, rounds)
        rows += Seq(mc.name, mk().name, f"${st.meanNs / 1e3}%.2f", f"${st.p50Ns / 1e3}%.2f",
                    f"${st.p999Ns / 1e3}%.2f", f"${st.maxNs / 1e3}%.2f")
      }
    }
    JobCommon.latencyTable(s"Figure 8: in-order bulk-insert latency (us), n=$n m=$m d=0", rows.result())
  }
}

object Fig09OooInsertLatency {
  def main(args: Array[String]): Unit = {
    val (n, m, d, rounds) = (benchN, 1024, 1024, scaled(150))
    val rows = Vector.newBuilder[Seq[String]]
    MonoidCases.forEach { mc =>
      for (mk <- Algos.ooo(mc.monoid)) {
        val st = LatencyBench.oooBulkInsertLatency(mk, mc.lift, n, m, d, rounds)
        rows += Seq(mc.name, mk().name, f"${st.meanNs / 1e3}%.2f", f"${st.p50Ns / 1e3}%.2f",
                    f"${st.p999Ns / 1e3}%.2f", f"${st.maxNs / 1e3}%.2f")
      }
    }
    JobCommon.latencyTable(s"Figure 9: ooo bulk-insert latency (us), n=$n m=$m d=$d", rows.result())
  }
}

object Fig10MemAblation {
  def main(args: Array[String]): Unit = {
    val (n, m, rounds) = (benchN, 4096, scaled(150))
    val rows = Vector.newBuilder[Seq[String]]
    MonoidCases.forEach { mc =>
      for (mk <- Algos.memAblation(mc.monoid)) {
        val st = LatencyBench.bulkEvictLatency(mk, mc.lift, n, m, rounds)
        rows += Seq(mc.name, mk().name, f"${st.meanNs / 1e3}%.2f", f"${st.p50Ns / 1e3}%.2f",
                    f"${st.p999Ns / 1e3}%.2f", f"${st.maxNs / 1e3}%.2f")
      }
    }
    JobCommon.latencyTable(s"Figure 10: free-list ablation, bulk-evict latency (us), n=$n m=$m", rows.result())
  }
}

object Fig11ThroughputEvict {
  def main(args: Array[String]): Unit = {
    val n = benchN
    val rows = Vector.newBuilder[Seq[String]]
    MonoidCases.forEach { mc =>
      if (mc.name != "geomean")
        for (mk <- Algos.all(mc.monoid); m <- Seq(1, 16, 256, 4096))
          rows += Seq(mc.name, mk().name, m.toString,
                      fmtThroughput(ThroughputBench.evictOnly(mk, mc.lift, n, m)))
    }
    println(table(s"Figure 11: throughput, bulk evict + single inserts, n=$n",
                  Seq("monoid", "algo", "m", "throughput"), rows.result()))
  }
}

object Fig12ThroughputBoth {
  def main(args: Array[String]): Unit = {
    val n = benchN
    val rows = Vector.newBuilder[Seq[String]]
    MonoidCases.forEach { mc =>
      if (mc.name != "geomean")
        for (mk <- Algos.all(mc.monoid); m <- Seq(1, 16, 256, 4096))
          rows += Seq(mc.name, mk().name, m.toString,
                      fmtThroughput(ThroughputBench.evictAndInsert(mk, mc.lift, n, m)))
    }
    println(table(s"Figure 12: throughput, bulk evict + bulk insert, n=$n",
                  Seq("monoid", "algo", "m", "throughput"), rows.result()))
  }
}

object Fig13ThroughputVaryD {
  def main(args: Array[String]): Unit = {
    val (n, m) = (benchN, 1024)
    val rows = Vector.newBuilder[Seq[String]]
    MonoidCases.forEach { mc =>
      if (mc.name != "geomean")
        for (mk <- Algos.ooo(mc.monoid); d <- Seq(0, 16, 256, 4096, 16384))
          rows += Seq(mc.name, mk().name, d.toString,
                      fmtThroughput(ThroughputBench.oooEvictAndInsert(mk, mc.lift, n, m, d)))
    }
    println(table(s"Figure 13: throughput, bulk ops at ooo distance d, n=$n m=$m",
                  Seq("monoid", "algo", "d", "throughput"), rows.result()))
  }
}

object Fig14ThroughputVaryDSingle {
  def main(args: Array[String]): Unit = {
    val n = benchN
    val rows = Vector.newBuilder[Seq[String]]
    MonoidCases.forEach { mc =>
      if (mc.name != "geomean")
        for (mk <- Algos.ooo(mc.monoid); d <- Seq(0, 16, 256, 4096, 16384))
          rows += Seq(mc.name, mk().name, d.toString,
                      fmtThroughput(ThroughputBench.oooEvictAndInsert(mk, mc.lift, n, 1, d)))
    }
    println(table(s"Figure 14: throughput, single ops at ooo distance d, n=$n m=1",
                  Seq("monoid", "algo", "d", "throughput"), rows.result()))
  }
}

object Fig15CitiBikeHistograms {
  def main(args: Array[String]): Unit = {
    val events = if (args.nonEmpty) args(0).toInt else 400000
    val trace = Workloads.traceTimeWindow(Workloads.citiBike(events), Workloads.DaySeconds)
    println(table(s"Figure 15: log2-bucketed histograms (1-day window, $events events)",
                  Seq("bucket", "count(n)", "count(m)", "count(d)"),
                  CitiBikeBench.histogramRows(trace)))
  }
}

object Fig16CitiBikeThroughput {
  def main(args: Array[String]): Unit = {
    val events = if (args.nonEmpty) args(0).toInt else 400000
    val stream = Workloads.citiBike(events)
    val rows = Vector.newBuilder[Seq[String]]
    MonoidCases.forEach { mc =>
      if (mc.name != "geomean")
        for (mk <- Algos.ooo(mc.monoid))
          rows += Seq(mc.name, mk().name,
                      fmtThroughput(CitiBikeBench.throughput(mk, mc.lift, stream, Workloads.DaySeconds)))
    }
    println(table(s"Figure 16: citi-bike-like throughput, 1-day window, $events events",
                  Seq("monoid", "algo", "throughput"), rows.result()))
  }
}

object Sec73LargeWindow {
  def main(args: Array[String]): Unit = {
    val rows = Seq(1 << 18, 1 << 22).map { n =>
      val r = LargeWindowBench.run(n, 1024, scaled(300))
      Seq(r.n.toString, f"${r.bytesPerItem}%.1f", fmtThroughput(r.throughputPerSec),
          f"${r.evict.meanNs / 1e3}%.2f", f"${r.evict.p50Ns / 1e3}%.2f",
          f"${r.evict.p999Ns / 1e3}%.2f", f"${r.evict.maxNs / 1e3}%.2f")
    }
    println(table("Section 7.3: large-window scaling (b_fiba4, geomean)",
                  Seq("n", "bytes/item", "throughput", "evict mean us", "p50 us", "p99.9 us", "max us"), rows))
  }
}

object Fig17Streaming {
  def main(args: Array[String]): Unit = {
    val spark = org.apache.spark.sql.SparkSession.builder()
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("fig17")
      .config("spark.sql.shuffle.partitions", "8")
      .getOrCreate()
    val windowLen = 8192L
    val rows = Vector.newBuilder[Seq[String]]
    for (m <- Seq(64, 512, 4096)) {
      for (algo <- Seq("recompute", "nb_fiba4", "b_fiba4"))
        rows += Seq(s"${algo}_state", m.toString,
                    fmtThroughput(StreamingBench.runStateful(spark, algo, windowLen, m, 16L * m)))
      rows += Seq("spark_window_builtin", m.toString,
                  fmtThroughput(StreamingBench.runBuiltin(spark, windowLen, 256L, m, math.max(2L * m, 4096L))))
    }
    println(table(s"Figure 17: Structured Streaming throughput, window=$windowLen",
                  Seq("algo", "m", "throughput"), rows.result()))
    spark.stop()
  }
}
