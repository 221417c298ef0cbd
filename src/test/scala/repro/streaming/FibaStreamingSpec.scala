package repro.streaming

import org.apache.spark.sql.execution.streaming.runtime.MemoryStream
import org.apache.spark.sql.streaming.StreamingQuery
import repro.{Oracle, SparkSpec}
import scala.util.Random

/** The Structured Streaming stateful operator (flatMapGroupsWithState +
  * FiBA, per the repro plan): correctness against DuckDB, parity between
  * the bulk / non-bulk / recompute state algorithms, out-of-order and
  * multi-key behavior, and recovery from the checkpointed snapshot.
  */
class FibaStreamingSpec extends SparkSpec {

  private def runStream(algo: String, windowLen: Long, batches: Seq[Seq[Event]],
                        fullState: Boolean = true,
                        dropCacheBetweenBatches: Boolean = false): Seq[WindowAgg] = {
    import spark.implicits._
    implicit val sqlCtx: org.apache.spark.sql.SQLContext = spark.sqlContext
    val input = MemoryStream[Event]
    val runId = java.util.UUID.randomUUID().toString
    val qn = "t_" + runId.replace("-", "").take(16)
    val out = FibaStreaming.aggregate(input.toDS(), windowLen, algo, "sum", runId, fullState)
    var q: StreamingQuery = null
    try {
      q = out.writeStream.format("memory").queryName(qn).outputMode("update").start()
      for (b <- batches) {
        if (dropCacheBetweenBatches) FibaStreaming.clearCache(runId) // simulate executor restart
        input.addData(b)
        q.processAllAvailable()
      }
      spark.table(qn).as[WindowAgg].collect().toSeq
    } finally {
      if (q != null) q.stop()
      FibaStreaming.clearCache(runId)
      spark.catalog.dropTempView(qn)
    }
  }

  private def finalAggs(rows: Seq[WindowAgg]): Map[Long, Double] =
    rows.groupBy(_.key).map { case (k, rs) => k -> rs.maxBy(_.watermark).agg }

  private def mkBatches(nBatches: Int, perBatch: Int, keys: Int, ooo: Boolean, seed: Long): Seq[Seq[Event]] = {
    val rnd = new Random(seed)
    var t = 0L
    (1 to nBatches).map { _ =>
      (1 to perBatch).map { _ =>
        t += 1 + rnd.nextInt(3)
        val lateness = if (ooo && rnd.nextInt(10) == 0) rnd.nextInt(500) else 0
        Event(rnd.nextInt(keys).toLong, math.max(0, t - lateness), (t % 97).toDouble)
      }
    }
  }

  test("windowed aggregate matches DuckDB on the final watermark (per key)") {
    import spark.implicits._
    val windowLen = 300L
    val batches = mkBatches(nBatches = 8, perBatch = 100, keys = 4, ooo = true, seed = 11)
    val rows = runStream("b_fiba4", windowLen, batches)
    val events = batches.flatten
    val eventsDf = events.toDF()
    val finals = finalAggs(rows)
    // per-key watermark = max time seen for that key
    val got = spark.createDataFrame(
      finals.toSeq.map { case (k, agg) => (k, agg) }).toDF("key", "agg")
    val wmByKey = events.groupBy(_.key).map { case (k, es) => k -> es.map(_.time).max }
    val wmDf = spark.createDataFrame(wmByKey.toSeq).toDF("key", "wm")
    Oracle.assertEquivalent(
      got,
      s"""SELECT CAST(e.key AS BIGINT) AS key, SUM(CAST(e.value AS DOUBLE)) AS agg
         |FROM events e JOIN wms w ON e.key = w.key
         |WHERE CAST(e.time AS BIGINT) > CAST(w.wm AS BIGINT) - $windowLen
         |GROUP BY 1""".stripMargin,
      "events" -> eventsDf.selectExpr("CAST(key AS BIGINT) key", "CAST(time AS BIGINT) time", "CAST(value AS DOUBLE) value"),
      "wms" -> wmDf.selectExpr("CAST(key AS BIGINT) key", "CAST(wm AS BIGINT) wm"))
  }

  test("bulk, non-bulk, and recompute state algorithms emit identical results") {
    val windowLen = 200L
    val batches = mkBatches(nBatches = 10, perBatch = 64, keys = 3, ooo = true, seed = 23)
    val a = runStream("b_fiba4", windowLen, batches).sortBy(r => (r.key, r.watermark))
    val b = runStream("nb_fiba4", windowLen, batches).sortBy(r => (r.key, r.watermark))
    val c = runStream("recompute", windowLen, batches).sortBy(r => (r.key, r.watermark))
    val d = runStream("b_fiba8", windowLen, batches).sortBy(r => (r.key, r.watermark))
    assert(a.map(r => (r.key, r.watermark)) == b.map(r => (r.key, r.watermark)))
    a.zip(b).foreach { case (x, y) => assert(math.abs(x.agg - y.agg) < 1e-6, s"$x vs $y") }
    a.zip(c).foreach { case (x, y) => assert(math.abs(x.agg - y.agg) < 1e-6, s"$x vs $y") }
    a.zip(d).foreach { case (x, y) => assert(math.abs(x.agg - y.agg) < 1e-6, s"$x vs $y") }
  }

  test("state snapshot recovery: dropping the live-tree cache changes nothing") {
    val windowLen = 250L
    val batches = mkBatches(nBatches = 8, perBatch = 50, keys = 2, ooo = true, seed = 31)
    val warm = runStream("b_fiba4", windowLen, batches, fullState = true)
      .sortBy(r => (r.key, r.watermark))
    val cold = runStream("b_fiba4", windowLen, batches, fullState = true, dropCacheBetweenBatches = true)
      .sortBy(r => (r.key, r.watermark))
    assert(warm.map(r => (r.key, r.watermark)) == cold.map(r => (r.key, r.watermark)))
    warm.zip(cold).foreach { case (x, y) => assert(math.abs(x.agg - y.agg) < 1e-6, s"$x vs $y") }
  }

  test("late events beyond the window are admitted then evicted (no effect)") {
    val windowLen = 100L
    val batches = Seq(
      (1 to 50).map(i => Event(0, 1000L + i, 1.0)),
      Seq(Event(0, 10L, 999.0)), // far-late event, outside the window
      Seq(Event(0, 1051L, 1.0)),
    )
    val rows = runStream("b_fiba4", windowLen, batches)
    val last = rows.maxBy(_.watermark)
    // window (951, 1051]: the 50 prefill events + the last one, late one gone
    assert(last.agg == 51.0, s"late event leaked into $last")
  }

  test("duplicate timestamps within a batch are pre-combined") {
    val rows = runStream("b_fiba4", 100L, Seq(Seq(
      Event(0, 5, 1.0), Event(0, 5, 2.0), Event(0, 7, 4.0), Event(0, 5, 8.0))))
    assert(rows.maxBy(_.watermark).agg == 15.0)
  }

  test("built-in sliding window agrees with DuckDB on a batch table") {
    import spark.implicits._
    val events = (1 to 500).map(i => Event(i % 3L, i.toLong, (i % 7).toDouble))
    val df = events.toDS()
    val got = BaselineStreaming.builtinSliding(df, windowLenSec = 60, slideSec = 30)
      .selectExpr("key", "unix_seconds(window.start) AS win_start", "agg")
    Oracle.assertEquivalent(
      got,
      """SELECT CAST(e.key AS BIGINT) AS key, w.win_start AS win_start, SUM(CAST(e.value AS DOUBLE)) AS agg
        |FROM events e
        |JOIN (SELECT DISTINCT (CAST(time AS BIGINT) // 30) * 30 - s.off AS win_start
        |      FROM events, (SELECT UNNEST([0, 30]) AS off) s) w
        |  ON CAST(e.time AS BIGINT) >= w.win_start AND CAST(e.time AS BIGINT) < w.win_start + 60
        |GROUP BY 1, 2""".stripMargin,
      "events" -> df.toDF().selectExpr("CAST(key AS BIGINT) key", "CAST(time AS BIGINT) time", "CAST(value AS DOUBLE) value"))
  }
}
