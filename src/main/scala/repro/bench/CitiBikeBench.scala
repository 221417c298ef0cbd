package repro.bench

import repro.core.Swag
import repro.bench.Workloads.Ride
import BenchUtil._

/** §7.4: real-data experiments on the synthetic Citi-Bike stand-in.
  * A 1-day time window driven by arrival order: single inserts with
  * naturally varying out-of-order distance d, and watermark-driven bulk
  * evictions with naturally varying bulk size m.
  */
object CitiBikeBench {

  /** Fig 16: events per second for one full pass over the stream. */
  def throughput[V](mk: () => Swag[V], lift: Long => V,
                    stream: IndexedSeq[Ride], windowLen: Long): Double = {
    val algo = mk()
    var watermark = Long.MinValue
    val t0 = System.nanoTime()
    var i = 0
    while (i < stream.length) {
      val e = stream(i)
      algo.insert(e.time, lift(e.time))
      if (e.time > watermark) {
        watermark = e.time
        algo.bulkEvict(watermark - windowLen)
      }
      if ((i & 0xff) == 0) sink = algo.query()
      i += 1
    }
    sink = algo.query()
    stream.length.toDouble / ((System.nanoTime() - t0) / 1e9)
  }

  /** Fig 15: histogram rows (log2 buckets) for n, m (m >= 1 only, like the
    * paper's eviction plot), and d (d >= 1).
    */
  def histogramRows(trace: Workloads.WindowTrace): Seq[Seq[String]] = {
    def hist(xs: Array[Int], keepZero: Boolean): Map[Int, Int] = {
      val m = scala.collection.mutable.Map.empty[Int, Int].withDefaultValue(0)
      xs.foreach { x =>
        if (x > 0) m(32 - Integer.numberOfLeadingZeros(x)) += 1 // bucket: 2^(b-1)..2^b-1
        else if (keepZero) m(0) += 1
      }
      m.toMap
    }
    val hn = hist(trace.ns, keepZero = false)
    val hm = hist(trace.ms, keepZero = false)
    val hd = hist(trace.ds, keepZero = true)
    val buckets = (hn.keySet ++ hm.keySet ++ hd.keySet).toSeq.sorted
    buckets.map { b =>
      val range = if (b == 0) "0" else s"[${1 << (b - 1)},${(1 << b) - 1}]"
      Seq(range, hn.getOrElse(b, 0).toString, hm.getOrElse(b, 0).toString, hd.getOrElse(b, 0).toString)
    }
  }
}
