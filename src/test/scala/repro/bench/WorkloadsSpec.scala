package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.bench.Workloads._

/** The measurement harness behind Fig 15: window tracing (n, m, d) and
  * the synthetic Citi-Bike stream's qualitative properties.
  */
class WorkloadsSpec extends AnyFunSuite {

  test("traceTimeWindow on a hand-computed stream") {
    // window length 10; arrivals (time): 1, 5, 3, 20, 25
    val s = IndexedSeq(Ride(1, 0), Ride(5, 0), Ride(3, 0), Ride(20, 0), Ride(25, 0))
    val tr = traceTimeWindow(s, windowLen = 10)
    // arrival 1: d=0, no evict, n=1
    // arrival 5: d=0, no evict, n=2
    // arrival 3: one entry (5) is newer -> d=1; n=3
    // arrival 20: d=0; evict <=10: entries 1,5,3 -> m=3; n=1
    // arrival 25: d=0; evict <=15: none -> m=0; n=2
    assert(tr.ds.toSeq == Seq(0, 0, 1, 0, 0))
    assert(tr.ms.toSeq == Seq(0, 0, 0, 3, 0))
    assert(tr.ns.toSeq == Seq(1, 2, 3, 1, 2))
  }

  test("trace sizes are internally consistent on the synthetic stream") {
    val s = citiBike(20000)
    val tr = traceTimeWindow(s, DaySeconds)
    assert(tr.ns.length == s.length)
    // conservation: inserts - evictions = final size
    assert(s.length - tr.ms.sum == tr.ns.last)
    assert(tr.ns.forall(_ >= 0) && tr.ds.forall(_ >= 0) && tr.ms.forall(_ >= 0))
  }

  test("citiBike is deterministic in its seed") {
    assert(citiBike(5000) == citiBike(5000))
    assert(citiBike(5000, seed = 1) != citiBike(5000, seed = 2))
  }

  test("citiBike timestamps are non-negative and mostly increasing") {
    val s = citiBike(30000)
    assert(s.forall(_.time >= 0))
    val inOrder = s.sliding(2).count { case Seq(a, b) => b.time >= a.time }
    assert(inOrder.toDouble / s.length > 0.7, "stream should be mostly in-order")
    assert(inOrder.toDouble / s.length < 1.0, "stream should contain disorder")
  }

  test("fenwick prefix sums") {
    val f = new Fenwick(100)
    f.add(3, 2); f.add(50, 1); f.add(99, 4)
    assert(f.prefix(2) == 0)
    assert(f.prefix(3) == 2)
    assert(f.prefix(50) == 3)
    assert(f.prefix(99) == 7)
    f.add(50, -1)
    assert(f.prefix(99) == 6)
  }
}
