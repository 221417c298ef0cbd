package repro.streaming

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, SynthData}

/** Batch sliding-window sums built on FiBA vs DuckDB RANGE window frames
  * — a direct semantic oracle for the paper's ADT over real query shapes.
  */
class SlidingBatchSpec extends SparkSpec {

  private def check(df: org.apache.spark.sql.DataFrame, win: Long): Unit = {
    val got = SlidingBatch.slidingSums(spark, df, win)
    Oracle.assertEquivalent(
      got,
      s"""SELECT t, SUM(v) OVER (ORDER BY t RANGE BETWEEN ${win - 1} PRECEDING AND CURRENT ROW) AS window_sum
         |FROM (SELECT CAST(t AS BIGINT) AS t, SUM(CAST(v AS DOUBLE)) AS v FROM events GROUP BY 1)
         |ORDER BY t""".stripMargin,
      "events" -> df.toDF("t", "v"))
  }

  test("sliding sums over uniform keys match DuckDB RANGE frames") {
    import spark.implicits._
    val df = SynthData.uniformKeys(spark, rows = 5000, nKeys = 800)
      .select($"k".as("t"), round($"v", 3).cast("double").as("v"))
    check(df, 50)
  }

  test("sliding sums over zipf (heavily duplicated) keys match DuckDB") {
    import spark.implicits._
    val df = SynthData.zipfKeys(spark, rows = 5000, nKeys = 500)
      .select($"k".as("t"), round($"v", 3).cast("double").as("v"))
    check(df, 97)
  }

  test("sliding sums with window of 1 equal the per-timestamp sums") {
    import spark.implicits._
    val df = Seq((1L, 2.0), (1L, 3.0), (4L, 1.0), (9L, 7.0)).toDF("t", "v")
    check(df, 1)
  }

  test("sliding sums over sparse gaps match DuckDB") {
    import spark.implicits._
    val df = (1 to 400).map(i => ((i * i).toLong % 100000, i.toDouble)).toDF("t", "v")
    check(df, 5000)
  }
}
