package repro

import org.apache.spark.sql.functions._

/** Sanity checks for the synthetic generators plus a DuckDB-oracle round
  * trip on a plain aggregation query (exercises the Oracle plumbing end
  * to end before the windowed tests rely on it).
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem generator is deterministic and well-formed at SF=0.001") {
    val a = SynthData.lineitem(spark, sf = 0.001)
    val b = SynthData.lineitem(spark, sf = 0.001)
    assert(a.count() == b.count())
    assert(a.count() > 1000)
    val row = a.agg(min("l_quantity"), max("l_quantity"), min("l_discount"), max("l_discount")).head
    assert(row.getDouble(0) >= 1.0 && row.getDouble(1) <= 51.0)
    assert(row.getDouble(2) >= 0.0 && row.getDouble(3) <= 0.10 + 1e-9)
  }

  test("orders generator covers the expected key space") {
    val o = SynthData.orders(spark, sf = 0.001)
    assert(o.count() == 1500)
    assert(o.select(countDistinct("o_orderkey")).head.getLong(0) == 1500)
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000)
    val u = SynthData.uniformKeys(spark, 20000, 1000)
    val zTop = z.groupBy("k").count().orderBy(desc("count")).head.getLong(1)
    val uTop = u.groupBy("k").count().orderBy(desc("count")).head.getLong(1)
    assert(zTop > 3 * uTop, s"zipf head $zTop should dominate uniform head $uTop")
  }

  test("oracle round trip: grouped aggregate matches DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    val got = li.groupBy("l_returnflag")
      .agg(sum("l_quantity").as("sum_qty"), count(lit(1)).as("cnt"))
      .select(col("l_returnflag"), col("sum_qty"), col("cnt"))
    Oracle.assertEquivalent(
      got,
      "SELECT l_returnflag, SUM(CAST(l_quantity AS DOUBLE)) AS sum_qty, COUNT(*) AS cnt " +
        "FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li)
  }
}
