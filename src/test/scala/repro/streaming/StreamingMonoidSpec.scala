package repro.streaming

import org.apache.spark.sql.execution.streaming.runtime.MemoryStream
import repro.SparkSpec

/** The streaming operator with non-sum monoids and many keys: max/min
  * windows, and agreement with the batch FiBA sliding job on the same
  * event sequence.
  */
class StreamingMonoidSpec extends SparkSpec {

  private def run(algo: String, monoid: String, windowLen: Long,
                  batches: Seq[Seq[Event]]): Seq[WindowAgg] = {
    import spark.implicits._
    implicit val sqlCtx: org.apache.spark.sql.SQLContext = spark.sqlContext
    val input = MemoryStream[Event]
    val runId = java.util.UUID.randomUUID().toString
    val qn = "m_" + runId.replace("-", "").take(16)
    val q = FibaStreaming.aggregate(input.toDS(), windowLen, algo, monoid, runId, fullState = true)
      .writeStream.format("memory").queryName(qn).outputMode("update").start()
    try {
      batches.foreach { b => input.addData(b); q.processAllAvailable() }
      spark.table(qn).as[WindowAgg].collect().toSeq
    } finally {
      q.stop(); FibaStreaming.clearCache(runId); spark.catalog.dropTempView(qn)
    }
  }

  test("max monoid: window maximum tracks insertions and evictions") {
    val batches = Seq(
      (1 to 50).map(i => Event(0, i.toLong, i.toDouble)),          // max 50
      Seq(Event(0, 60L, 5.0)),                                      // window (10,60]: max 49? no: 50 in window
      Seq(Event(0, 120L, 7.0)),                                     // window (70,120]: only 120
    )
    val rows = run("b_fiba4", "max", 50L, batches).sortBy(_.watermark)
    assert(rows.map(_.agg) == Seq(50.0, 50.0, 7.0))
  }

  test("min monoid: eviction removes the old minimum") {
    val batches = Seq(
      Seq(Event(0, 1L, 1.0), Event(0, 2L, 9.0), Event(0, 3L, 4.0)),
      Seq(Event(0, 52L, 6.0)), // window (2,52]: values 4.0, 6.0
    )
    val rows = run("b_fiba4", "min", 50L, batches).sortBy(_.watermark)
    assert(rows.map(_.agg) == Seq(1.0, 4.0))
  }

  test("many keys: each key's window is independent") {
    val batches = Seq(
      (0 until 20).map(k => Event(k.toLong, 10L + k, k.toDouble)),
      (0 until 20).map(k => Event(k.toLong, 200L + k, 1.0)),
    )
    val rows = run("b_fiba4", "sum", 100L, batches)
    val finals = rows.groupBy(_.key).map { case (k, rs) => k -> rs.maxBy(_.watermark).agg }
    // second batch evicted each key's first event (gap > 100)
    (0 until 20).foreach(k => assert(finals(k.toLong) == 1.0, s"key=$k"))
  }

  test("streaming final window equals the batch FiBA sliding job") {
    import spark.implicits._
    val events = (1 to 300).map(i => Event(0, (i * 3 % 700).toLong, (i % 11).toDouble))
    val distinctLastWm = events.map(_.time).max
    val rows = run("b_fiba4", "sum", 100L, Seq(events))
    val streamingFinal = rows.maxBy(_.watermark).agg
    val batchDf = events.toDF().selectExpr("time AS t", "value AS v")
    val batch = SlidingBatch.slidingSums(spark, batchDf, 100L)
      .where(s"t = $distinctLastWm").head.getDouble(1)
    assert(math.abs(streamingFinal - batch) < 1e-9)
  }
}
