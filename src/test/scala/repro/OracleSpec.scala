package repro

/** The oracle must actually catch wrong results — otherwise every
  * "matches DuckDB" test in this repo is vacuous.
  */
class OracleSpec extends SparkSpec {
  import spark.implicits._

  test("oracle accepts a correct equivalence") {
    val df = Seq((1, "a"), (2, "b")).toDF("x", "s")
    Oracle.assertEquivalent(
      df.selectExpr("CAST(x AS INT) AS x", "s"),
      "SELECT CAST(x AS INT) AS x, s FROM t",
      "t" -> df)
  }

  test("oracle rejects a wrong row") {
    val df = Seq((1, 10.0), (2, 20.0)).toDF("k", "v")
    val wrong = Seq((1L, 10.0), (2L, 21.0)).toDF("k", "v")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong,
        "SELECT CAST(k AS BIGINT) AS k, CAST(v AS DOUBLE) AS v FROM t", "t" -> df)
    }
  }

  test("oracle rejects missing rows") {
    val df = Seq((1, 10.0), (2, 20.0)).toDF("k", "v")
    val missing = Seq((1L, 10.0)).toDF("k", "v")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(missing,
        "SELECT CAST(k AS BIGINT) AS k, CAST(v AS DOUBLE) AS v FROM t", "t" -> df)
    }
  }

  test("oracle rejects mismatched column sets") {
    val df = Seq((1, 10.0)).toDF("k", "v")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(df.select($"k"), "SELECT k AS other FROM t", "t" -> df)
    }
  }
}
