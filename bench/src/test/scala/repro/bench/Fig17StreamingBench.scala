package repro.bench

import repro.SparkSpec
import BenchUtil._

/** Figure 17: end-to-end streaming throughput, window n = 8192, varying
  * bulk (micro-batch) size m, in-order data. The paper ran FiBA inside
  * Apache Flink 1.17 against Flink's built-in sliding window; we run the
  * FiBA stateful operator in Spark Structured Streaming against (a)
  * Spark's built-in sliding `window()` aggregation and (b) a recompute-
  * per-batch stateful baseline. Paper result: FiBA beats the engine
  * built-in by a wide margin even without bulk eviction; bulk eviction
  * widens the gap; throughput improves with m.
  */
class Fig17StreamingBench extends BenchSuite with SparkSpec {
  private val windowLen = 8192L
  private val ms = Seq(64, 512, 4096)

  test(s"fig 17: streaming throughput, window=$windowLen, m sweep") {
    val rows = Vector.newBuilder[Seq[String]]
    val cells = scala.collection.mutable.Map.empty[(String, Int), Double]

    for (m <- ms) {
      val events = math.max(4L * m, (16L * m * benchScale).toLong)
      for (algo <- Seq("recompute", "nb_fiba4", "b_fiba4")) {
        val thr = StreamingBench.runStateful(spark, algo, windowLen, m, events)
        cells((algo, m)) = thr
        rows += Seq(s"${algo}_state", m.toString, fmtThroughput(thr))
      }
      // Built-in sliding window: coarse 256s slide (handicap in its favor)
      // and a small event budget — it is orders of magnitude slower.
      val builtinEvents = math.max(2L * m, 1024L)
      val thrB = StreamingBench.runBuiltin(spark, windowLen, 256L, m, builtinEvents)
      cells(("builtin", m)) = thrB
      rows += Seq("spark_window_builtin", m.toString, fmtThroughput(thrB))
    }
    emit(s"Figure 17: Structured Streaming throughput, window=$windowLen (events/s)",
         Seq("algo", "m", "throughput"), rows.result())

    // Paper shape: FiBA beats the engine's built-in sliding window.
    // Micro-batch scheduling noise can flip a single cell, so compare the
    // geometric-mean ratio across the whole m sweep.
    val ratios = ms.map(m => cells(("b_fiba4", m)) / cells(("builtin", m)))
    val geomean = math.exp(ratios.map(math.log).sum / ratios.size)
    assert(geomean > 1.1,
      s"expected FiBA stateful operator to out-throughput the built-in sliding window (ratios=$ratios)")
    // Paper shape: throughput improves with bulk size m.
    assert(cells(("b_fiba4", 4096)) > cells(("b_fiba4", 64)),
      "expected FiBA throughput to improve with larger micro-batches")
  }
}
