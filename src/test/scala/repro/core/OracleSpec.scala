package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}

/** Tests for the DuckDB oracle itself: it must accept equivalent results
  * and reject wrong ones — a broken oracle would silently pass everything.
  */
class OracleSpec extends SparkSpec {
  import spark.implicits._

  private lazy val df = Seq((1L, "a", 1.5), (2L, "b", 2.5), (3L, "a", 3.5))
    .toDF("id", "k", "v")

  test("accepts an equivalent aggregation") {
    val got = df.groupBy("k").agg(count(lit(1)).as("n"))
      .select(col("k"), col("n").cast("string").as("n"))
    Oracle.assertEquivalent(
      got, "SELECT k, CAST(COUNT(*) AS VARCHAR) AS n FROM t GROUP BY k", "t" -> df)
  }

  test("accepts results independent of row and column order") {
    val got = df.select(col("v").cast("string").as("v"), col("id").cast("string").as("id"))
      .orderBy(col("v").desc)
    Oracle.assertEquivalent(got, "SELECT id, v FROM t", "t" -> df)
  }

  test("rejects a wrong row count") {
    val got = df.limit(2).select(col("id").cast("string").as("id"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(got, "SELECT id FROM t", "t" -> df)
    }
  }

  test("rejects a wrong value") {
    val got = df.select((col("id") + 1).cast("string").as("id"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(got, "SELECT id FROM t", "t" -> df)
    }
  }

  test("rejects mismatched column sets") {
    val got = df.select(col("id").cast("string").as("wrong_name"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(got, "SELECT id FROM t", "t" -> df)
    }
  }

  test("handles nulls on both sides") {
    val withNull = Seq((1L, Some("x")), (2L, None)).toDF("id", "s")
    val got = withNull.select(col("id").cast("string").as("id"), col("s"))
    Oracle.assertEquivalent(got, "SELECT id, s FROM t", "t" -> withNull)
  }

  test("canonicalizes float formatting (0.5 == 0.500000)") {
    // DuckDB returns DOUBLE; both sides go through the %.6f canonicalizer
    Oracle.assertEquivalent(
      df.groupBy("k").agg(sum("v").as("sv")),
      "SELECT k, SUM(CAST(v AS DOUBLE)) AS sv FROM t GROUP BY k",
      "t" -> df)
  }
}
