package repro.name

import repro.{Oracle, SparkSpec}
import repro.embed.{PseudoBert, VecOps}
import org.apache.spark.sql.functions._

/** Unit tests for the segment-wise semantic top-k (Faiss substitute). */
class SensSpec extends SparkSpec {

  private def vecs(n: Int, dim: Int, salt: Long): Array[Array[Float]] =
    Array.tabulate(n)(i => VecOps.normalize(VecOps.hashGaussian(salt + i, dim)))

  test("top-k matches brute force exactly") {
    val src = vecs(40, 16, 100)
    val tgt = vecs(60, 16, 900)
    val got = Sens.similarity(spark, src, tgt, k = 5, segments = 3).collectRows()
    src.indices.foreach { i =>
      val brute = tgt.indices
        .map(j => (j.toLong, VecOps.manhattanSim(src(i), tgt(j))))
        .sortBy { case (j, s) => (-s, j) }.take(5)
      assert(got(i.toLong).toSeq == brute, s"row $i differs")
    }
  }

  test("segment count does not change the result") {
    val src = vecs(25, 8, 7)
    val tgt = vecs(33, 8, 77)
    val a = Sens.similarity(spark, src, tgt, k = 4, segments = 1).collectRows()
    val b = Sens.similarity(spark, src, tgt, k = 4, segments = 5).collectRows()
    assert(a.view.mapValues(_.toSeq).toMap == b.view.mapValues(_.toSeq).toMap)
  }

  test("k larger than target count returns all targets") {
    val src = vecs(5, 8, 1)
    val tgt = vecs(3, 8, 2)
    val rows = Sens.similarity(spark, src, tgt, k = 10).collectRows()
    assert(rows.values.forall(_.length == 3))
  }

  test("nnz is exactly k per source row") {
    val m = Sens.similarity(spark, vecs(20, 8, 3), vecs(50, 8, 4), k = 7)
    assert(m.nnz == 20 * 7)
  }

  test("identical vector ranks first with similarity 1") {
    val src = vecs(10, 8, 5)
    val tgt = src.map(_.clone) // identical
    val rows = Sens.similarity(spark, src, tgt, k = 3).collectRows()
    (0 until 10).foreach { i =>
      val (bestT, bestS) = rows(i.toLong).head
      assert(bestT == i.toLong && math.abs(bestS - 1.0) < 1e-6)
    }
  }

  test("per-row maximum agrees with DuckDB oracle") {
    val m = Sens.similarity(spark, vecs(15, 8, 9), vecs(20, 8, 10), k = 4)
    val rowMax = m.df.groupBy("src").agg(max("score").as("best"))
      .select(col("src").cast("string").as("src"),
              format_number(col("best"), 6).as("best"))
    Oracle.assertEquivalent(
      rowMax,
      """SELECT src, printf('%.6f', MAX(CAST(score AS DOUBLE))) AS best
        |FROM sim GROUP BY src""".stripMargin,
      "sim" -> m.df)
  }

  test("segmentBounds covers [0,n) without overlap") {
    val b = Sens.segmentBounds(10, 3)
    assert(b.head._1 == 0 && b.last._2 == 10)
    b.sliding(2).foreach { case Array((_, h), (l, _)) => assert(h == l); case _ => }
    assert(Sens.segmentBounds(2, 5).map(x => x._2 - x._1).sum == 2)
  }

  test("aligned names rank high through pseudo-BERT + SENS") {
    val ds = repro.kg.KGGen.generate(spark, repro.exp.Datasets.tiny())
    val bert = new PseudoBert(ds.lexicon, 32)
    val m = Sens.similarity(spark,
      bert.embedAll(ds.source.namesArray), bert.embedAll(ds.target.namesArray), k = 10)
    val rows = m.collectRows()
    val hits = ds.truthPairs.count { case (s, t) => rows(s).headOption.exists(_._1 == t) }
    info(s"SENS-only H@1 on tiny: ${hits / 300.0}")
    assert(hits > 200, s"SENS should align most clean names, got $hits/300")
  }
}
