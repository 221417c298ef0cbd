package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Monoids._
import repro.core.baseline._
import repro.core.fiba.{BFiba, NbFiba}

/** The ADT contract of §3.1, checked uniformly across every algorithm:
  * empty-window behavior, FIFO semantics, boundary conventions of
  * bulkEvict(t) (strictly-greater survive), bulkInsert interleaving, and
  * snapshot consistency where supported.
  */
class SwagContractSpec extends AnyFunSuite {

  private def factories: Seq[(String, () => Swag[Vector[Long]])] = Seq(
    ("b_fiba2", () => new BFiba[Vector[Long]](2, ConcatM)),
    ("b_fiba4", () => new BFiba[Vector[Long]](4, ConcatM)),
    ("b_fiba8", () => new BFiba[Vector[Long]](8, ConcatM)),
    ("nb_fiba4", () => new NbFiba[Vector[Long]](4, ConcatM)),
    ("amta", () => new Amta[Vector[Long]](ConcatM)),
    ("twostacks_lite", () => new TwoStacksLite[Vector[Long]](ConcatM)),
    ("daba_lite*", () => new DeamortizedTwoStacks[Vector[Long]](ConcatM)),
    ("brute", () => new BruteForceSwag[Vector[Long]](ConcatM)),
  )

  for ((name, mk) <- factories) {
    test(s"$name: empty window has identity query and empty extrema") {
      val a = mk()
      assert(a.query() == Vector.empty)
      assert(a.size == 0 && a.minTime.isEmpty && a.maxTime.isEmpty)
      a.evict() // must be a no-op
      assert(a.query() == Vector.empty)
    }

    test(s"$name: FIFO semantics over an in-order run") {
      val a = mk()
      for (t <- 1L to 300L) a.insert(t, Vector(t))
      assert(a.size == 300)
      assert(a.minTime.contains(1L) && a.maxTime.contains(300L))
      assert(a.query() == (1L to 300L).toVector)
      for (_ <- 1 to 100) a.evict()
      assert(a.query() == (101L to 300L).toVector)
      assert(a.minTime.contains(101L))
    }

    test(s"$name: bulkEvict keeps strictly-greater timestamps") {
      val a = mk()
      for (t <- 10L to 200L by 10) a.insert(t, Vector(t))
      a.bulkEvict(100) // exact hit: 100 goes, 110 stays
      assert(a.minTime.contains(110L), s"got ${a.minTime}")
      a.bulkEvict(105) // between entries: no-op
      assert(a.minTime.contains(110L))
      a.bulkEvict(Long.MaxValue - 1)
      assert(a.size == 0 && a.query() == Vector.empty)
    }

    test(s"$name: window slides correctly across many refill cycles") {
      val a = mk()
      var t = 0L
      for (cycle <- 1 to 30) {
        for (_ <- 1 to 20) { t += 1; a.insert(t, Vector(t)) }
        a.bulkEvict(t - 10)
        assert(a.size == 10, s"cycle=$cycle")
        assert(a.query() == ((t - 9) to t).toVector, s"cycle=$cycle")
      }
    }

    test(s"$name: snapshot (if supported) equals the window contents") {
      val a = mk()
      for (t <- 1L to 50L) a.insert(t, Vector(t))
      a.bulkEvict(7)
      a.snapshot() match {
        case Some(entries) =>
          assert(entries.map(_._1) == (8L to 50L))
          assert(entries.map(_._2) == (8L to 50L).map(Vector(_)))
        case None => // aggregate-only structure: allowed
      }
    }
  }

  for ((name, mk) <- factories.filter { case (_, f) => f().supportsOoo }) {
    test(s"$name: out-of-order inserts interleave in timestamp order") {
      val a = mk()
      Seq(10L, 2L, 30L, 7L, 15L, 1L).foreach(t => a.insert(t, Vector(t)))
      assert(a.query() == Vector(1L, 2L, 7L, 10L, 15L, 30L))
    }

    test(s"$name: bulkInsert interleaves and combines per the ADT") {
      val a = mk()
      Seq(2L, 4L, 6L).foreach(t => a.insert(t, Vector(t)))
      a.bulkInsert(IndexedSeq((1L, Vector(1L)), (4L, Vector(40L)), (7L, Vector(7L))))
      assert(a.query() == Vector(1L, 2L, 4L, 40L, 6L, 7L))
      assert(a.size == 5)
    }
  }
}
