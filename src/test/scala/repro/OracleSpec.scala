package repro

import org.apache.spark.sql.functions._

/** Self-test of the DuckDB oracle utility: it must accept equivalent results
  * and reject wrong ones — otherwise every oracle-based test is vacuous.
  */
class OracleSpec extends SparkSpec {

  private lazy val t = spark.range(1, 50).select(
    col("id") as "k",
    (col("id") % 7) as "v")

  test("accepts an equivalent aggregation") {
    val got = t.groupBy("v").count().select(col("v"), col("count") as "n")
    Oracle.assertEquivalent(got, "SELECT v, count(*) AS n FROM t GROUP BY v", "t" -> t)
  }

  test("rejects a wrong result") {
    val wrong = t.groupBy("v").count().select(col("v"), (col("count") + 1) as "n")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong, "SELECT v, count(*) AS n FROM t GROUP BY v", "t" -> t)
    }
  }

  test("rejects missing rows") {
    val subset = t.where(col("k") < 10)
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(subset, "SELECT k, v FROM t", "t" -> t)
    }
  }

  test("rejects column-name mismatches with a helpful message") {
    val got = t.select(col("k") as "wrongname", col("v"))
    val e = intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(got, "SELECT k, v FROM t", "t" -> t)
    }
    assert(e.getMessage.contains("column mismatch"))
  }

  test("join equivalence over two tables") {
    val s = spark.range(1, 30).select(col("id") as "k", (col("id") * 2) as "w")
    val got = t.join(s, "k").select(t("k") as "k", col("v"), col("w"))
    Oracle.assertEquivalent(got,
      "SELECT t.k AS k, t.v AS v, s.w AS w FROM t, s WHERE t.k = s.k",
      "t" -> t, "s" -> s)
  }
}
