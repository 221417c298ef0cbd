package repro.bench

import repro.core.Swag
import BenchUtil._

/** Throughput experiments (Figs 11–14): items processed per second over a
  * long run of slide-by-m rounds, gross time including all operations
  * (§7.2). Round counts adapt so each cell runs a bounded wall-clock
  * time; REPRO_SCALE shrinks them further for smoke runs.
  */
object ThroughputBench {

  /** Run `round` repeatedly (each processing `itemsPerRound` items) until
    * at least `minElapsedNs` and `minRounds` are reached; returns items/s.
    */
  private def measure(itemsPerRound: Int, minRounds: Int, round: () => Unit): Double = {
    val minElapsedNs = (2e8 * benchScale).toLong.max(1)
    // settle the heap so earlier cells' garbage is not billed to this one
    System.gc()
    // warmup
    var w = 0
    val warm = math.max(2, minRounds / 10)
    while (w < warm) { round(); w += 1 }
    // best of two measurement windows — single windows are ~0.2 s and
    // JIT/GC state across a long suite run otherwise skews cells by 10x+
    var best = 0.0
    var rep = 0
    while (rep < 2) {
      var items = 0L
      var elapsed = 0L
      var r = 0
      val t0 = System.nanoTime()
      while (r < minRounds || elapsed < minElapsedNs) {
        round()
        items += itemsPerRound
        r += 1
        elapsed = System.nanoTime() - t0
      }
      best = math.max(best, items.toDouble / (elapsed / 1e9))
      rep += 1
    }
    best
  }

  /** Fig 11: bulk evict + single inserts. Per round: one bulkEvict of the
    * oldest m, m single inserts, one query. Counts m items per round.
    */
  def evictOnly[V](mk: () => Swag[V], lift: Long => V, n: Int, m: Int): Double = {
    val algo = mk()
    var top = 0L
    while (top < n) { top += 1; algo.insert(top, lift(top)) }
    measure(m, minRounds = math.max(8, (n / m) / 4), round = () => {
      algo.bulkEvict(algo.minTime.get + m - 1)
      var k = 0
      while (k < m) { top += 1; algo.insert(top, lift(top)); k += 1 }
      sink = algo.query()
    })
  }

  /** Fig 12: bulk evict + bulk insert. Per round: one bulkEvict of the
    * oldest m, one bulkInsert of m, one query.
    */
  def evictAndInsert[V](mk: () => Swag[V], lift: Long => V, n: Int, m: Int): Double = {
    val algo = mk()
    var top = 0L
    while (top < n) { top += 1; algo.insert(top, lift(top)) }
    measure(m, minRounds = math.max(8, (n / m) / 4), round = () => {
      algo.bulkEvict(algo.minTime.get + m - 1)
      val base = top
      val batch = (1 to m).map { k => val t = base + k; (t, lift(t)) }
      top += m
      algo.bulkInsert(batch)
      sink = algo.query()
    })
  }

  /** Figs 13 (m=1024) and 14 (m=1): bulk evict + bulk insert with the
    * insert bulk landing ~d entries behind the young end. Evens carry the
    * in-order stream; each round also inserts m fresh odds whose youngest
    * sits d entries below the top (see EXPERIMENTS.md). 2m items/round.
    * For m = 1 single insert/evict calls are used (no bulk ops), as in
    * Fig 14.
    */
  def oooEvictAndInsert[V](mk: () => Swag[V], lift: Long => V, n: Int, m: Int, d: Int): Double = {
    val algo = mk()
    require(algo.supportsOoo)
    var top = 0L
    while (top < 2L * n) { top += 2; algo.insert(top, lift(top)) }
    val useBulk = m > 1
    measure(2 * m, minRounds = math.max(8, (n / m) / 4), round = () => {
      if (useBulk) algo.bulkEvict(algo.minTime.get + 2 * m - 1)
      else { algo.evict(); algo.evict() }
      val base = top
      if (useBulk) {
        val evens = (1 to m).map { k => val t = base + 2 * k; (t, lift(t)) }
        top += 2 * m
        algo.bulkInsert(evens)
        val lo = top - 2L * (d + m) + 1
        val odds = (0 until m).map { k => val t = lo + 2 * k; (t, lift(t)) }
        algo.bulkInsert(odds)
      } else {
        top += 2
        algo.insert(top, lift(top))
        val t = top - 2L * (d + 1) + 1
        algo.insert(t, lift(t))
      }
      sink = algo.query()
    })
  }
}
