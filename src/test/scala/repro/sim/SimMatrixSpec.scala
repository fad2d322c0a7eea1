package repro.sim

import repro.{Oracle, SparkSpec}
import org.apache.spark.sql.functions._

/** Unit tests for the sparse similarity matrix, oracle-checked. */
class SimMatrixSpec extends SparkSpec {

  private lazy val a = SimMatrix.fromLocal(spark,
    Seq((0L, 0L, 0.9), (0L, 1L, 0.3), (1L, 1L, 0.7), (2L, 0L, 0.2)))
  private lazy val b = SimMatrix.fromLocal(spark,
    Seq((0L, 0L, 0.1), (1L, 2L, 0.5), (3L, 3L, 1.0)))

  test("plus adds over the union of supports") {
    val rows = a.plus(b).collectRows()
    assert(math.abs(rows(0L).find(_._1 == 0L).get._2 - 1.0) < 1e-12)
    assert(math.abs(rows(1L).find(_._1 == 2L).get._2 - 0.5) < 1e-12)
    assert(math.abs(rows(3L).find(_._1 == 3L).get._2 - 1.0) < 1e-12)
    assert(rows.values.map(_.length).sum == 6)
  }

  test("plus with weight scales the other matrix") {
    val rows = a.plus(b, 0.5).collectRows()
    assert(math.abs(rows(0L).find(_._1 == 0L).get._2 - 0.95) < 1e-12)
    assert(math.abs(rows(3L).find(_._1 == 3L).get._2 - 0.5) < 1e-12)
  }

  test("plus agrees with DuckDB full-outer sum") {
    val fused = a.plus(b).df.select(
      col("src").cast("string").as("src"),
      col("tgt").cast("string").as("tgt"),
      format_number(col("score"), 6).as("score"))
    Oracle.assertEquivalent(
      fused,
      """SELECT src, tgt, printf('%.6f', SUM(s)) AS score FROM (
        |  SELECT src, tgt, CAST(score AS DOUBLE) AS s FROM ma
        |  UNION ALL
        |  SELECT src, tgt, CAST(score AS DOUBLE) AS s FROM mb
        |) GROUP BY src, tgt""".stripMargin,
      "ma" -> a.df, "mb" -> b.df)
  }

  test("topK keeps the k best per source") {
    val m = SimMatrix.fromLocal(spark,
      Seq((0L, 0L, 0.1), (0L, 1L, 0.9), (0L, 2L, 0.5), (1L, 0L, 0.2)))
    val rows = m.topK(2).collectRows()
    assert(rows(0L).map(_._1).toSeq == Seq(1L, 2L))
    assert(rows(1L).map(_._1).toSeq == Seq(0L))
  }

  test("topK ties break by target id ascending (oracle)") {
    val m = SimMatrix.fromLocal(spark,
      Seq((0L, 5L, 0.5), (0L, 3L, 0.5), (0L, 9L, 0.5)))
    val got = m.topK(2).df.select(
      col("src").cast("string").as("src"), col("tgt").cast("string").as("tgt"))
    Oracle.assertEquivalent(
      got,
      """SELECT src, tgt FROM (
        |  SELECT src, tgt, ROW_NUMBER() OVER (PARTITION BY src
        |    ORDER BY CAST(score AS DOUBLE) DESC, CAST(tgt AS BIGINT) ASC) AS rn
        |  FROM m) WHERE rn <= 2""".stripMargin,
      "m" -> m.df)
  }

  test("nnz counts stored cells") {
    assert(a.nnz == 4)
    assert(SimMatrix.empty(spark).nnz == 0)
  }

  test("collectRows sorts each row desc with id tiebreak") {
    val m = SimMatrix.fromLocal(spark,
      Seq((0L, 2L, 0.5), (0L, 1L, 0.5), (0L, 3L, 0.9)))
    assert(m.collectRows()(0L).toSeq == Seq((3L, 0.9), (1L, 0.5), (2L, 0.5)))
  }

  test("empty matrix plus empty is empty") {
    assert(SimMatrix.empty(spark).plus(SimMatrix.empty(spark)).nnz == 0)
  }
}
