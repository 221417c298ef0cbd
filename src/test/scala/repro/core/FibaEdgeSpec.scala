package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Monoids._
import repro.core.fiba.{BFiba, FibaTree}

/** Targeted FiBA scenarios beyond the randomized property tests: tree
  * growth/shrink transitions, right-spine eviction (root replacement),
  * massive single-bulk inserts, free-list reuse, and API edges.
  */
class FibaEdgeSpec extends AnyFunSuite {

  private def filled(minArity: Int, n: Int): FibaTree[Vector[Long]] = {
    val t = new FibaTree[Vector[Long]](minArity, ConcatM)
    for (i <- 1 to n) t.insertOne(i.toLong, Vector(i.toLong))
    t
  }

  test("minArity below 2 is rejected") {
    intercept[IllegalArgumentException](new FibaTree[Vector[Long]](1, ConcatM))
  }

  test("root leaf grows into a tree and shrinks back to a root leaf") {
    val t = new FibaTree[Vector[Long]](2, ConcatM)
    for (i <- 1 to 64) { t.insertOne(i.toLong, Vector(i.toLong)); t.validate() }
    for (_ <- 1 to 63) { t.evictOldest(); t.validate() }
    assert(t.queryAgg() == Vector(64L))
    t.evictOldest()
    assert(t.isEmpty && t.queryAgg() == Vector.empty)
    // refill after total drain
    for (i <- 100 to 130) { t.insertOne(i.toLong, Vector(i.toLong)); t.validate() }
    assert(t.queryAgg() == (100L to 130L).toVector)
  }

  test("bulkEvict cutting deep into the right spine replaces the root") {
    for (minArity <- Seq(2, 3, 4); keep <- Seq(1, 2, 3, 5, 17)) {
      val t = filled(minArity, 2000)
      t.bulkEvictNative(2000L - keep)
      t.validate()
      assert(t.queryAgg() == ((2000L - keep + 1) to 2000L).toVector,
        s"minArity=$minArity keep=$keep")
    }
  }

  test("bulkEvict at every possible cut of a medium window stays valid") {
    for (cut <- 0 to 120) {
      val t = filled(2, 120)
      t.bulkEvictNative(cut.toLong)
      t.validate()
      assert(t.queryAgg() == ((cut + 1).toLong to 120L).toVector, s"cut=$cut")
    }
  }

  test("one giant bulk insert builds a valid multi-level tree") {
    for (minArity <- Seq(2, 8)) {
      val t = new FibaTree[Vector[Long]](minArity, ConcatM)
      t.insertOne(0L, Vector(0L))
      val es = (1L to 20000L).map(i => (i, Vector(i)))
      t.bulkInsertNative(es)
      t.validate()
      assert(t.sizeByTraversal == 20001)
      assert(t.queryAgg().take(5) == Vector(0L, 1L, 2L, 3L, 4L))
      assert(t.queryAgg().length == 20001)
    }
  }

  test("giant out-of-order bulk insert into a gap") {
    val t = new FibaTree[Vector[Long]](4, ConcatM)
    (1L to 5000L).foreach(i => t.insertOne(i * 3, Vector(i * 3)))
    val bulk = (1L until 5000L).map(i => (i * 3 + 1, Vector(i * 3 + 1)))
    t.bulkInsertNative(bulk)
    t.validate()
    assert(t.sizeByTraversal == 9999)
  }

  test("free-list reuse: slide long enough to cycle the pool, results exact") {
    val withPool = new BFiba[Vector[Long]](2, ConcatM, useFreeList = true)
    val noPool = new BFiba[Vector[Long]](2, ConcatM, useFreeList = false)
    var t = 0L
    for (round <- 1 to 200) {
      val m = 1 + round % 40
      val batch = (1 to m).map { k => (t + k, Vector(t + k)) }
      t += m
      withPool.bulkInsert(batch); noPool.bulkInsert(batch)
      withPool.bulkEvict(t - 100); noPool.bulkEvict(t - 100)
      assert(withPool.query() == noPool.query(), s"round=$round")
    }
    withPool.underlying.validate()
    noPool.underlying.validate()
  }

  test("toEntries round-trips through bulkInsert into an empty tree") {
    val t = filled(3, 500)
    t.bulkEvictNative(123)
    val entries = t.toEntries
    val rebuilt = new FibaTree[Vector[Long]](3, ConcatM)
    rebuilt.bulkInsertNative(entries)
    rebuilt.validate()
    assert(rebuilt.queryAgg() == t.queryAgg())
    assert(rebuilt.toEntries == entries)
  }

  test("interleaved equal-timestamp bulk combines in window order") {
    val t = new FibaTree[Vector[Long]](2, ConcatM)
    (1L to 100L).foreach(i => t.insertOne(i, Vector(i)))
    // bulk hits 50 existing timestamps and adds 50 fresh ones above
    val bulk = ((26L to 75L).map(i => (i, Vector(i + 1000))) ++
                (101L to 150L).map(i => (i, Vector(i)))).sortBy(_._1)
    t.bulkInsertNative(bulk)
    t.validate()
    val q = t.queryAgg()
    assert(q.length == 200)
    assert(q.slice(25, 27) == Vector(26L, 1026L)) // combined at t=26, in order
  }

  test("query after alternating growth and total clears") {
    val t = new FibaTree[Vector[Long]](2, ConcatM)
    for (round <- 1 to 15) {
      val base = round * 1000L
      t.bulkInsertNative((0L until 300L).map(i => (base + i, Vector(base + i))))
      t.validate()
      assert(t.sizeByTraversal == 300)
      t.bulkEvictNative(base + 299)
      t.validate()
      assert(t.isEmpty)
    }
  }

  test("min/max time track the fingers under mixed bulks") {
    val t = new FibaTree[Vector[Long]](4, ConcatM)
    t.bulkInsertNative((100L to 400L).map(i => (i, Vector(i))))
    assert(t.minTimeOpt.contains(100L) && t.maxTimeOpt.contains(400L))
    t.bulkInsertNative(IndexedSeq((50L, Vector(50L)), (500L, Vector(500L))))
    assert(t.minTimeOpt.contains(50L) && t.maxTimeOpt.contains(500L))
    t.bulkEvictNative(499)
    assert(t.minTimeOpt.contains(500L) && t.maxTimeOpt.contains(500L))
  }

  test("sum monoid at larger arity matches a running reference") {
    val t = new FibaTree[Long](8, CountL)
    var expected = 0L
    for (i <- 1L to 3000L) { t.insertOne(i, i); expected += i }
    assert(t.queryAgg() == expected)
    t.bulkEvictNative(1000)
    assert(t.queryAgg() == (1001L to 3000L).sum)
  }
}
