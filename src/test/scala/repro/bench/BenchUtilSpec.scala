package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.bench.BenchUtil._

/** Unit tests for the measurement harness itself. */
class BenchUtilSpec extends AnyFunSuite {

  test("stats: percentiles of a known distribution") {
    val s = stats((1L to 1000L).toArray)
    assert(s.count == 1000)
    assert(math.abs(s.meanNs - 500.5) < 1e-9)
    assert(s.p50Ns == 501L)
    assert(s.p999Ns == 1000L)
    assert(s.maxNs == 1000L)
  }

  test("stats: single sample") {
    val s = stats(Array(42L))
    assert(s.p50Ns == 42L && s.maxNs == 42L && s.meanNs == 42.0)
  }

  test("stats: rejects empty input") {
    intercept[IllegalArgumentException](stats(Array.emptyLongArray))
  }

  test("stats does not mutate its input") {
    val in = Array(3L, 1L, 2L)
    stats(in)
    assert(in.toSeq == Seq(3L, 1L, 2L))
  }

  test("table aligns columns") {
    val out = table("T", Seq("a", "bbb"), Seq(Seq("xx", "y"), Seq("1", "22222")))
    val lines = out.linesIterator.toVector
    assert(lines.head == "== T ==")
    assert(lines(2).startsWith("--"))
    assert(lines.drop(1).map(_.length).distinct.size <= 2) // padded rows align
  }

  test("fmtThroughput picks sensible units") {
    assert(fmtThroughput(2.5e6) == "2.50M/s")
    assert(fmtThroughput(1500) == "1.5k/s")
    assert(fmtThroughput(42) == "42/s")
  }

  test("scaled never drops below 3 rounds") {
    assert(scaled(100) >= 3)
    assert(scaled(5) >= 3)
  }

  test("MonoidCases.forEach covers the paper's three monoids") {
    var names = List.empty[String]
    MonoidCases.forEach(r => names ::= r.name)
    assert(names.toSet == Set("sum", "geomean", "bloom"))
  }

  test("MonoidCases lifts are pure per timestamp") {
    MonoidCases.forEach { r =>
      assert(r.lift(123L) == r.lift(123L), r.name)
    }
  }

  test("Algos rosters have the paper's lineup") {
    import repro.core.Monoids.CountL
    assert(Algos.all(CountL).map(_.apply().name).toSet ==
      Set("b_fiba4", "b_fiba8", "nb_fiba4", "nb_fiba8", "amta", "twostacks_lite", "daba_lite*"))
    assert(Algos.ooo(CountL).map(_.apply().name).forall(_.contains("fiba")))
    assert(Algos.memAblation(CountL).map(_.apply().name).toSet ==
      Set("b_fiba4", "b_fiba4_nofl", "b_fiba8", "b_fiba8_nofl"))
  }
}
