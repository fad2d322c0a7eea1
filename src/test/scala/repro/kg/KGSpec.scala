package repro.kg

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}

/** Unit tests for the KG DataFrame wrapper, oracle-checked. */
class KGSpec extends SparkSpec {

  private lazy val kg = KG.fromLocal(
    spark, "en",
    names = Array("a", "b", "c", "d"),
    triples = Array((0L, 0, 1L), (1L, 1, 2L), (2L, 0, 3L), (0L, 1, 1L), (3L, 0, 3L)))

  test("numEntities / numRelations / numTriples") {
    assert(kg.numEntities == 4)
    assert(kg.numRelations == 2)
    assert(kg.numTriples == 5)
  }

  test("triple count agrees with DuckDB oracle") {
    Oracle.assertEquivalent(
      kg.triples.groupBy("r").agg(count(lit(1)).as("n"))
        .select(col("r").cast("string").as("r"), col("n").cast("string").as("n")),
      "SELECT r, CAST(COUNT(*) AS VARCHAR) AS n FROM triples GROUP BY r",
      "triples" -> kg.triples)
  }

  test("namesArray is id-indexed") {
    assert(kg.namesArray.toSeq == Seq("a", "b", "c", "d"))
  }

  test("undirectedEdges collapses parallel and reverse edges, drops self-loops") {
    val edges = kg.undirectedEdges.collect()
      .map(r => (r.getLong(0), r.getLong(1), r.getDouble(2))).toSet
    // (0,1) appears twice (two relations) -> once; (3,3) self-loop dropped
    assert(edges == Set((0L, 1L, 1.0), (1L, 2L, 1.0), (2L, 3L, 1.0)))
  }

  test("undirectedEdges via DuckDB oracle") {
    Oracle.assertEquivalent(
      kg.undirectedEdges.select(
        col("u").cast("string").as("u"), col("v").cast("string").as("v")),
      """SELECT DISTINCT CAST(LEAST(CAST(h AS BIGINT), CAST(t AS BIGINT)) AS VARCHAR) AS u,
        |                CAST(GREATEST(CAST(h AS BIGINT), CAST(t AS BIGINT)) AS VARCHAR) AS v
        |FROM triples WHERE h <> t""".stripMargin,
      "triples" -> kg.triples)
  }

  test("degree distribution via DuckDB oracle") {
    val sparkDeg = kg.triples.select(col("h").as("e"))
      .unionByName(kg.triples.select(col("t").as("e")))
      .groupBy("e").agg(count(lit(1)).as("deg"))
      .select(col("e").cast("string").as("e"), col("deg").cast("string").as("deg"))
    Oracle.assertEquivalent(
      sparkDeg,
      """SELECT e, CAST(COUNT(*) AS VARCHAR) AS deg FROM (
        |  SELECT h AS e FROM triples UNION ALL SELECT t AS e FROM triples
        |) GROUP BY e""".stripMargin,
      "triples" -> kg.triples)
  }

  test("fromLocal round-trips entities") {
    val rows = kg.entities.orderBy("id").collect()
    assert(rows.map(_.getLong(0)).toSeq == Seq(0L, 1L, 2L, 3L))
    assert(rows.map(_.getString(1)).toSeq == Seq("a", "b", "c", "d"))
  }
}
