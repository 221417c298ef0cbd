package repro.bench

import repro.core.{Monoid, Swag}
import BenchUtil._

/** Latency experiments (Figs 7–10): time each bulk operation individually
  * and summarize the distribution (the paper draws violins; we print the
  * same statistics as rows). Methodology mirrors §7.1: a warmed window of
  * n entries slides by m per round; only the operation under test is
  * timed. Timestamps are dense integers, so evicting the oldest m means
  * bulkEvict(minTime + m - 1).
  */
object LatencyBench {

  /** Fig 7: bulk evict only. Per round: TIMED bulkEvict of the oldest m,
    * untimed m single inserts at the young end, query.
    */
  def bulkEvictLatency[V](mk: () => Swag[V], lift: Long => V,
                          n: Int, m: Int, rounds: Int): LatencyStats = {
    System.gc() // settle earlier cells' garbage
    val algo = mk()
    var top = 0L
    while (top < n) { top += 1; algo.insert(top, lift(top)) }
    val samples = new Array[Long](rounds)
    var r = 0
    val warmup = math.max(50, rounds / 4)
    var i = -warmup
    while (r < rounds) {
      val cut = algo.minTime.get + m - 1
      val t = timeNs(algo.bulkEvict(cut))
      var k = 0
      while (k < m) { top += 1; algo.insert(top, lift(top)); k += 1 }
      sink = algo.query()
      if (i >= 0) { samples(r) = t; r += 1 }
      i += 1
    }
    stats(samples)
  }

  /** Fig 8: bulk insert only, in-order. Per round: untimed bulkEvict of
    * the oldest m, TIMED bulkInsert of m fresh entries at the young end.
    */
  def bulkInsertLatency[V](mk: () => Swag[V], lift: Long => V,
                           n: Int, m: Int, rounds: Int): LatencyStats = {
    System.gc() // settle earlier cells' garbage
    val algo = mk()
    var top = 0L
    while (top < n) { top += 1; algo.insert(top, lift(top)) }
    val samples = new Array[Long](rounds)
    var r = 0
    val warmup = math.max(50, rounds / 4)
    var i = -warmup
    while (r < rounds) {
      algo.bulkEvict(algo.minTime.get + m - 1)
      val base = top
      val batch = (1 to m).map { k => val t = base + k; (t, lift(t)) }
      top += m
      val t = timeNs(algo.bulkInsert(batch))
      sink = algo.query()
      if (i >= 0) { samples(r) = t; r += 1 }
      i += 1
    }
    stats(samples)
  }

  /** Fig 9: bulk insert, out-of-order at distance ~d. The in-order stream
    * occupies even timestamps; each round inserts a TIMED bulk of m fresh
    * odd timestamps whose youngest lands d window entries below the top
    * (see EXPERIMENTS.md for the construction). Per round: untimed
    * bulkEvict of the oldest 2m, untimed bulkInsert of m evens at the
    * top, TIMED ooo bulkInsert of m odds, query.
    */
  def oooBulkInsertLatency[V](mk: () => Swag[V], lift: Long => V,
                              n: Int, m: Int, d: Int, rounds: Int): LatencyStats = {
    require(mk().supportsOoo, "ooo latency bench needs an ooo-capable algorithm")
    System.gc() // settle earlier cells' garbage
    val algo = mk()
    var top = 0L
    while (top < 2L * n) { top += 2; algo.insert(top, lift(top)) } // evens
    val samples = new Array[Long](rounds)
    var r = 0
    val warmup = math.max(50, rounds / 4)
    var i = -warmup
    while (r < rounds) {
      algo.bulkEvict(algo.minTime.get + 2 * m - 1)
      val base = top
      val evens = (1 to m).map { k => val t = base + 2 * k; (t, lift(t)) }
      top += 2 * m
      algo.bulkInsert(evens)
      // odd bulk: youngest at ~d entries below the new top
      val lo = top - 2L * (d + m) + 1
      val odds = (0 until m).map { k => val t = lo + 2 * k; (t, lift(t)) }
      val t = timeNs(algo.bulkInsert(odds))
      sink = algo.query()
      if (i >= 0) { samples(r) = t; r += 1 }
      i += 1
    }
    stats(samples)
  }
}
