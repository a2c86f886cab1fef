package repro

/** Sanity tests of the DuckDB oracle itself: it must accept equivalent
  * results and reject wrong ones, or every oracle-backed test is vacuous.
  */
class OracleSpec extends SparkSpec {

  import spark.implicits._

  private lazy val tiny = Seq((1L, "a"), (2L, "b"), (2L, "c")).toDF("k", "s")

  test("accepts an equivalent aggregation") {
    val sparkSide = tiny.groupBy("k").count().withColumnRenamed("count", "n")
    Oracle.assertEquivalent(sparkSide,
      "SELECT k, count(*) AS n FROM t GROUP BY k", "t" -> tiny)
  }

  test("rejects a wrong result") {
    val wrong = Seq((1L, 99L)).toDF("k", "n")
    assertThrows[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong,
        "SELECT k, count(*) AS n FROM t GROUP BY k", "t" -> tiny)
    }
  }

  test("rejects mismatched column sets") {
    val misnamed = tiny.groupBy("k").count()
    assertThrows[IllegalArgumentException] {
      Oracle.assertEquivalent(misnamed,
        "SELECT k, count(*) AS n FROM t GROUP BY k", "t" -> tiny)
    }
  }

  test("null handling: nulls canonicalize identically on both sides") {
    val withNull = Seq((Some(1L), "x"), (None, "y")).toDF("k", "s")
    Oracle.assertEquivalent(withNull.select("k", "s"),
      "SELECT k, s FROM t", "t" -> withNull)
  }
}
