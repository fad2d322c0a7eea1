package repro.bench

import repro.SparkSpec
import repro.exp.{Datasets, Tables}

/** Reproduces Table 4 + §3.5 — unsupervised EA on DBP1M (lite).
  *
  * Paper: DA generates 528,040 (EN-FR) / 476,527 (EN-DE) pseudo seeds at
  * 93.86% / 93.85% precision; unsupervised accuracy ≈ supervised accuracy
  * (H@1 within ~0.3 points everywhere).
  *
  * Asserted shape: pseudo seeds are plentiful (vs. the 20% training set)
  * and high-precision; unsupervised H@1 ≈ supervised H@1.
  */
class Table4Bench extends SparkSpec {

  test("Table 4: unsupervised EA on DBP1M via name-based data augmentation") {
    val (unsupRows, daStats) = Tables.table4(spark)
    val (supRows, _) = Tables.table3(spark)

    println("\n=== §3.5 — DA pseudo-seed statistics ===")
    daStats.foreach(s =>
      println(f"${s.dataset}: ${s.pseudoSeeds} pseudo seeds, precision ${s.precision * 100}%.2f%%"))
    println("=== Table 4 (lite) — unsupervised EA on DBP1M ===")
    println(Tables.renderEaRows(unsupRows))

    // DA quality: high precision, substantial seed counts
    daStats.foreach { s =>
      assert(s.precision > 0.80, s"${s.dataset}: DA precision ${s.precision}")
      val spec = Datasets.all.find(_.key == s.dataset).get
      val trainSize = (spec.cfg.nCore * spec.cfg.seedRatio).toInt
      assert(s.pseudoSeeds > trainSize,
        s"${s.dataset}: DA (${s.pseudoSeeds}) should out-number the 20% seeds ($trainSize)")
    }

    // unsupervised ≈ supervised, per (dataset, method)
    unsupRows.foreach { u =>
      val s = supRows.find(r => r.dataset == u.dataset && r.method == u.method).get
      assert(math.abs(u.h1 - s.h1) < 0.08,
        s"${u.dataset} ${u.method}: unsup=${u.h1} sup=${s.h1}")
    }
  }
}
