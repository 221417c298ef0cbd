package repro.bench

import scala.util.Random

/** Workload generators beyond the controlled n/m/d sweeps.
  *
  * `citiBike` substitutes the NYC Citi Bike trips (Aug–Dec 2018) used in
  * §7.4 — unavailable offline — with a synthetic ride stream engineered
  * to match Fig 15's marginal histograms: a diurnal event rate with
  * heavy-tailed bursts (so the 1-day window size n fluctuates widely and
  * eviction bulk sizes m are mostly 1 but reach the thousands), and
  * heavy-tailed lateness (so most out-of-order distances d are ~0 with
  * hundreds of insertions displaced by tens of thousands of records).
  */
object Workloads {

  /** One stream record: arrival order is the vector order; `time` is the
    * event timestamp (seconds); value payload is derived from `time`.
    */
  final case class Ride(time: Long, value: Double)

  val DaySeconds: Long = 86400L

  /** Deterministic synthetic ride stream in arrival order. */
  def citiBike(nEvents: Int, seed: Long = 2018L): IndexedSeq[Ride] = {
    val rnd = new Random(seed)
    val out = new Array[Ride](nEvents)
    var emitTime = 0.0 // stream-clock seconds
    var i = 0
    while (i < nEvents) {
      // diurnal rate: mean inter-arrival 4s..40s over a 24h cycle
      val phase = (emitTime % DaySeconds) / DaySeconds.toDouble
      val meanGap = 4.0 + 36.0 * (0.5 + 0.5 * math.cos(2 * math.Pi * phase))
      // heavy-tailed bursts: 2% of gaps are 100x the mean (quiet spells
      // whose end triggers large bulk evictions)
      val burst = if (rnd.nextDouble() < 0.02) 100.0 else 1.0
      emitTime += -math.log(1.0 - rnd.nextDouble()) * meanGap * burst
      // heavy-tailed lateness: mostly punctual, a Pareto tail up to ~1 day
      val u = rnd.nextDouble()
      val lateness =
        if (u < 0.85) 0.0
        else if (u < 0.98) rnd.nextInt(120).toDouble
        else math.min(DaySeconds.toDouble, 30.0 * math.pow(1.0 - rnd.nextDouble(), -1.2))
      val ts = math.max(0.0, emitTime - lateness).toLong
      out(i) = Ride(ts, (ts % 97).toDouble)
      i += 1
    }
    out.toIndexedSeq
  }

  /** Characterization of a time-windowed run over an arrival stream:
    * per-arrival window size n, eviction bulk size m, and out-of-order
    * distance d (records in the window younger than the new event).
    * Computed with a Fenwick tree over second-resolution time — this is
    * measurement harness, not one of the algorithms under test.
    */
  final case class WindowTrace(ns: Array[Int], ms: Array[Int], ds: Array[Int])

  def traceTimeWindow(stream: IndexedSeq[Ride], windowLen: Long): WindowTrace = {
    val maxT = (stream.iterator.map(_.time).max + 2).toInt
    val fen = new Fenwick(maxT + 2)
    val cnt = new Array[Int](maxT + 2) // live entries per second slot
    val ns = new Array[Int](stream.length)
    val ms = new Array[Int](stream.length)
    val ds = new Array[Int](stream.length)
    var watermark = Long.MinValue
    var cutPtr = -1L // everything <= cutPtr already evicted; only moves forward
    var size = 0
    var i = 0
    while (i < stream.length) {
      val e = stream(i)
      val ti = e.time.toInt
      // out-of-order distance: entries currently in the window newer than e
      ds(i) = if (size == 0) 0 else size - fen.prefix(ti)
      if (e.time > watermark) watermark = e.time
      fen.add(ti, 1); cnt(ti) += 1
      size += 1
      // evict everything <= watermark - windowLen (cut only moves forward,
      // so this walk is amortized O(maxT) over the whole run)
      val cut = math.min(watermark - windowLen, maxT.toLong)
      var evicted = 0
      while (cutPtr < cut) {
        cutPtr += 1
        val c = cnt(cutPtr.toInt)
        if (c > 0) { fen.add(cutPtr.toInt, -c); cnt(cutPtr.toInt) = 0; evicted += c }
      }
      ms(i) = evicted
      size -= evicted
      ns(i) = size
      i += 1
    }
    WindowTrace(ns, ms, ds)
  }

  /** Fenwick (binary indexed) tree over [0, n): point add, prefix sum. */
  final class Fenwick(n: Int) {
    private val a = new Array[Int](n + 1)
    def add(i0: Int, v: Int): Unit = {
      var i = i0 + 1
      while (i <= n) { a(i) += v; i += i & (-i) }
    }
    /** Sum of counts at positions <= i0. */
    def prefix(i0: Int): Int = {
      var i = math.min(i0 + 1, n)
      var s = 0
      while (i > 0) { s += a(i); i -= i & (-i) }
      s
    }
  }
}
