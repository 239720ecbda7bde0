package repro

import org.apache.spark.sql.SparkSession

/** Self-tests for the DuckDB oracle: it must accept equivalent results
  * and reject wrong ones — otherwise every oracle-backed test in the
  * repo is vacuous.
  */
class OracleSpec extends SparkSpec {
  implicit lazy val s: SparkSession = spark

  private def df(rows: Seq[(Long, String)]) = {
    import s.implicits._
    s.createDataset(rows).toDF("k", "v")
  }

  test("accepts an exactly equivalent aggregation") {
    import s.implicits._
    val base = df(Seq((1L, "a"), (1L, "b"), (2L, "c")))
    val agg = s.createDataset(Seq((1L, 2L), (2L, 1L))).toDF("k", "cnt")
    Oracle.assertEquivalent(agg,
      "SELECT CAST(k AS BIGINT) AS k, count(*) AS cnt FROM t GROUP BY k",
      "t" -> base)
  }

  test("rejects a wrong row count") {
    import s.implicits._
    val base = df(Seq((1L, "a"), (2L, "b")))
    val wrong = s.createDataset(Seq((1L, 99L), (2L, 1L))).toDF("k", "cnt")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong,
        "SELECT CAST(k AS BIGINT) AS k, count(*) AS cnt FROM t GROUP BY k",
        "t" -> base)
    }
  }

  test("rejects mismatched column sets") {
    import s.implicits._
    val base = df(Seq((1L, "a")))
    val bad = s.createDataset(Seq(Tuple1(1L))).toDF("wrong_name")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(bad, "SELECT count(*) AS cnt FROM t", "t" -> base)
    }
  }

  test("canonicalizes doubles to 6 decimal places") {
    import s.implicits._
    val base = df(Seq((1L, "a"), (1L, "b")))
    val avg = s.createDataset(Seq(Tuple1(0.5))).toDF("frac")
    Oracle.assertEquivalent(avg,
      "SELECT count(*) FILTER (v = 'a') * 1.0 / count(*) AS frac FROM t",
      "t" -> base)
  }

  test("handles nulls on both sides") {
    import s.implicits._
    val base = s.createDataset(Seq((1L, Option.empty[String]), (2L, Some("x"))))
      .toDF("k", "v")
    val out = s.createDataset(Seq(Tuple1(1L))).toDF("nulls")
    Oracle.assertEquivalent(out,
      "SELECT count(*) AS nulls FROM t WHERE v IS NULL", "t" -> base)
  }
}
