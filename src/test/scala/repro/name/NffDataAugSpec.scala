package repro.name

import repro.{Oracle, SparkSpec}
import repro.exp.Datasets
import repro.kg.KGGen
import repro.sim.SimMatrix
import org.apache.spark.sql.functions._

/** Unit tests for NFF fusion and name-based data augmentation. */
class NffDataAugSpec extends SparkSpec {

  private lazy val ds = KGGen.generate(spark, Datasets.tiny())
  private lazy val nff = Nff.compute(spark, ds, phi = 10)

  test("Mn = Mse + gamma*Mst on the union of supports") {
    val mse = SimMatrix.fromLocal(spark, Seq((0L, 1L, 0.8), (0L, 2L, 0.5)))
    val mst = SimMatrix.fromLocal(spark, Seq((0L, 1L, 1.0), (3L, 3L, 0.4)))
    val mn = mse.plus(mst, 0.05).collectRows()
    assert(math.abs(mn(0L).find(_._1 == 1L).get._2 - 0.85) < 1e-12)
    assert(math.abs(mn(0L).find(_._1 == 2L).get._2 - 0.5) < 1e-12)
    assert(math.abs(mn(3L).find(_._1 == 3L).get._2 - 0.02) < 1e-12)
  }

  test("NFF produces all three matrices with sane sizes") {
    assert(nff.mse.nnz == 300 * 10)
    assert(nff.mst.nnz > 0)
    assert(nff.mn.nnz >= nff.mse.nnz)
  }

  test("name-only H@1 is strong on the tiny dataset") {
    val scores = repro.eval.Metrics.evaluate(nff.mn, ds.test)
    info(s"name-only: ${scores.pretty}")
    assert(scores.hits1 > 0.7)
  }

  test("pseudo seeds are mutual nearest neighbours (oracle SQL)") {
    val pseudo = DataAug.pseudoSeeds(nff.mn)
      .select(col("src").cast("string").as("src"), col("tgt").cast("string").as("tgt"))
    Oracle.assertEquivalent(
      pseudo,
      """WITH ranked AS (
        |  SELECT src, tgt, CAST(score AS DOUBLE) AS s,
        |    ROW_NUMBER() OVER (PARTITION BY src
        |      ORDER BY CAST(score AS DOUBLE) DESC, CAST(tgt AS BIGINT) ASC) AS rs,
        |    ROW_NUMBER() OVER (PARTITION BY tgt
        |      ORDER BY CAST(score AS DOUBLE) DESC, CAST(src AS BIGINT) ASC) AS rt
        |  FROM mn),
        |second AS (SELECT src, s AS second FROM ranked WHERE rs = 2)
        |SELECT r.src AS src, r.tgt AS tgt
        |FROM ranked r LEFT JOIN second x ON r.src = x.src
        |WHERE r.rs = 1 AND r.rt = 1
        |  AND (x.second IS NULL OR r.s >= x.second * 1.02)""".stripMargin,
      "mn" -> nff.mn.df)
  }

  test("pseudo seeds are 1-to-1") {
    val p = DataAug.pseudoSeeds(nff.mn).collect().map(r => (r.getLong(0), r.getLong(1)))
    assert(p.map(_._1).distinct.length == p.length)
    assert(p.map(_._2).distinct.length == p.length)
  }

  test("pseudo-seed precision is high (paper reports ~94% on DBP1M)") {
    val p = DataAug.pseudoSeeds(nff.mn).collect().map(r => (r.getLong(0), r.getLong(1)))
    val prec = DataAug.precision(p, ds.truthPairs)
    info(f"pseudo seeds: ${p.length}, precision ${prec * 100}%.1f%%")
    assert(prec > 0.85)
    assert(p.length > 100)
  }

  test("mergeSeeds keeps real seeds and stays 1-to-1") {
    val real = Array((1L, 10L), (2L, 20L))
    val pseudo = Array((1L, 99L), (3L, 20L), (4L, 40L), (5L, 40L))
    val merged = DataAug.mergeSeeds(real, pseudo)
    assert(merged.toSet == Set((1L, 10L), (2L, 20L), (4L, 40L)))
  }

  test("precision helper") {
    assert(DataAug.precision(Array((1L, 1L), (2L, 3L)), Array((1L, 1L), (2L, 2L))) == 0.5)
    assert(DataAug.precision(Array.empty, Array((1L, 1L))) == 0.0)
  }

  test("unknown entities reduce pseudo-seed count but not much precision") {
    val unk = KGGen.generate(spark, Datasets.tinyWithUnknowns())
    val n = Nff.compute(spark, unk, phi = 10)
    val p = DataAug.pseudoSeeds(n.mn).collect().map(r => (r.getLong(0), r.getLong(1)))
    val prec = DataAug.precision(p, unk.truthPairs)
    info(f"with unknowns: ${p.length} seeds, precision ${prec * 100}%.1f%%")
    assert(prec > 0.6)
  }
}
