package repro.streaming

import org.apache.spark.sql.{Dataset, SparkSession}
import org.apache.spark.sql.streaming.{GroupState, GroupStateTimeout, OutputMode}
import repro.core.{Monoid, Swag}
import repro.core.Monoids.{MaxD, MinD, SumD}
import repro.core.baseline.BruteForceSwag
import repro.core.fiba.{BFiba, NbFiba}
import scala.collection.mutable.ArrayBuffer

/** One stream record: per-key event time (seconds) and a Double payload. */
final case class Event(key: Long, time: Long, value: Double)

/** Checkpointed per-key window state: the full (time, value) contents (or
  * empty arrays in heap-backend emulation mode) plus the watermark.
  */
final case class WindowSnapshot(times: Array[Long], values: Array[Double], watermark: Long)

/** One output row per key per micro-batch: the sliding-window aggregate
  * after incorporating the batch and advancing the window.
  */
final case class WindowAgg(key: Long, watermark: Long, agg: Double)

/** The paper's end-to-end integration (§7.5), mapped from Apache Flink to
  * Spark Structured Streaming per the repro hint: a stateful operator
  * (`flatMapGroupsWithState`) maintains one sliding-window aggregation
  * structure per key. Each micro-batch becomes ONE `bulkInsert` (rows
  * sorted and pre-combined by timestamp) and the watermark advance ONE
  * `bulkEvict` — exercising exactly the paper's bulk primitives.
  *
  * State handling: live trees are kept in an executor-local cache (like
  * Flink's heap state backend); with `fullState = true` the operator also
  * checkpoints the entire window into the state store each batch, so a
  * restarted executor rebuilds the tree via one bulk insert. Benches use
  * `fullState = false` to avoid timing O(n) serialization per batch.
  */
object FibaStreaming {

  /** Executor-local live trees, keyed by (runId, key). */
  private val cache = new java.util.concurrent.ConcurrentHashMap[(String, Long), Swag[Double]]()

  def clearCache(runId: String): Unit = {
    val it = cache.keySet().iterator()
    while (it.hasNext) if (it.next()._1 == runId) it.remove()
  }

  def monoidByName(name: String): Monoid[Double] = name match {
    case "sum" => SumD
    case "max" => MaxD
    case "min" => MinD
    case other => throw new IllegalArgumentException(s"unknown Double monoid: $other")
  }

  /** "b_fiba4" | "b_fiba8" | "nb_fiba4" | "nb_fiba8" | "recompute". */
  def makeAlgo(algoName: String, m: Monoid[Double]): Swag[Double] = algoName match {
    case "b_fiba4"   => new BFiba[Double](4, m)
    case "b_fiba8"   => new BFiba[Double](8, m)
    case "nb_fiba4"  => new NbFiba[Double](4, m)
    case "nb_fiba8"  => new NbFiba[Double](8, m)
    case "recompute" => new BruteForceSwag[Double](m) // Flink-style refold per batch
    case other       => throw new IllegalArgumentException(s"unknown algo: $other")
  }

  /** Stateful sliding-window aggregation over an event stream. */
  def aggregate(events: Dataset[Event], windowLen: Long, algoName: String,
                monoidName: String, runId: String, fullState: Boolean): Dataset[WindowAgg] = {
    val spark = events.sparkSession
    import spark.implicits._
    events
      .groupByKey(_.key)
      .flatMapGroupsWithState[WindowSnapshot, WindowAgg](
        OutputMode.Update(), GroupStateTimeout.NoTimeout()) {
        (key, rows, state) =>
          processBatch(key, rows, state, windowLen, algoName, monoidName, runId, fullState)
      }
  }

  private def processBatch(key: Long, rows: Iterator[Event], state: GroupState[WindowSnapshot],
                           windowLen: Long, algoName: String, monoidName: String,
                           runId: String, fullState: Boolean): Iterator[WindowAgg] = {
    val monoid = monoidByName(monoidName)
    val cacheKey = (runId, key)
    var algo = cache.get(cacheKey)
    var watermark = Long.MinValue
    if (algo == null) {
      algo = makeAlgo(algoName, monoid)
      state.getOption.foreach { snap => // recovery: rebuild via one bulk insert
        watermark = snap.watermark
        if (snap.times.nonEmpty)
          algo.bulkInsert(snap.times.indices.map(i => (snap.times(i), snap.values(i))))
      }
      cache.put(cacheKey, algo)
    } else {
      watermark = state.getOption.map(_.watermark).getOrElse(Long.MinValue)
    }

    // Sort the batch and pre-combine duplicate timestamps so it is a
    // strictly increasing bulk, then do ONE bulk insert.
    val batch = rows.toArray
    if (batch.nonEmpty) {
      java.util.Arrays.sort(batch, Ordering.by((e: Event) => e.time))
      val merged = new ArrayBuffer[(Long, Double)](batch.length)
      var i = 0
      while (i < batch.length) {
        val t = batch(i).time
        var v = batch(i).value
        i += 1
        while (i < batch.length && batch(i).time == t) { v = monoid.combine(v, batch(i).value); i += 1 }
        merged += ((t, v))
      }
      algo.bulkInsert(merged.toIndexedSeq)
      watermark = math.max(watermark, batch.map(_.time).max)
    }
    // ONE bulk evict per batch: slide the window to (watermark - len, watermark].
    if (watermark != Long.MinValue) algo.bulkEvict(watermark - windowLen)

    val snap =
      if (fullState) {
        val entries = algo.snapshot().getOrElse(sys.error(s"$algoName cannot snapshot"))
        WindowSnapshot(entries.map(_._1).toArray, entries.map(_._2).toArray, watermark)
      } else WindowSnapshot(Array.emptyLongArray, Array.emptyDoubleArray, watermark)
    state.update(snap)
    Iterator.single(WindowAgg(key, watermark, algo.query()))
  }
}
