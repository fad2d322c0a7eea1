package repro.bench

import repro.SparkSpec
import repro.exp.{Datasets, Tables}

/** Reproduces Table 5 — percentage of equivalent entities placed into the
  * same mini-batch, METIS-CPS vs VPS, per dataset and direction.
  *
  * Paper shape: VPS is 100% on the training set by construction but
  * collapses to ≈1/K on the test set (20.7% at K=5 … 5.2% at K=20);
  * METIS-CPS is below 100% on train but far better on test (57–85% on
  * IDS, 30–45% on DBP1M) and on total.
  */
class Table5Bench extends SparkSpec {

  test("Table 5: equivalent-entity co-location per mini-batch") {
    val rows = Tables.table5(spark)
    println("\n=== Table 5 (lite) — co-location of equivalent entities ===")
    println(Tables.renderTable5(rows))

    val byKey = rows.groupBy(r => (r.dataset, r.method, r.direction))
      .view.mapValues(_.head).toMap

    Datasets.all.foreach { spec =>
      Seq("EN->L", "L->EN").foreach { dir =>
        val cps = byKey((spec.key, "METIS-CPS", dir))
        val vps = byKey((spec.key, "VPS", dir))

        // VPS: train = 100% by construction, test ~ 1/K
        assert(vps.train == 1.0, s"${spec.key} $dir: VPS train must be 100%")
        assert(vps.test < 2.5 / spec.k + 0.08,
          s"${spec.key} $dir: VPS test ${vps.test} should be ~1/${spec.k}")

        // METIS-CPS: beats VPS on test and total (the paper's headline)
        assert(cps.test > vps.test,
          s"${spec.key} $dir: CPS test ${cps.test} <= VPS ${vps.test}")
        assert(cps.total > vps.total,
          s"${spec.key} $dir: CPS total ${cps.total} <= VPS ${vps.total}")

        // METIS-CPS train is below 100% (structure-preservation tradeoff)
        assert(cps.train <= 1.0 && cps.train > 0.4,
          s"${spec.key} $dir: CPS train ${cps.train}")
      }
    }

    // DBP1M co-location is inferior to IDS (sparser structure + unknowns)
    val cpsTest = (k: String) => rows.filter(r =>
      r.dataset == k && r.method == "METIS-CPS").map(_.test).max
    assert(cpsTest("DBP1M-EN-FR") < cpsTest("IDS15K-EN-FR"),
      "DBP1M should co-locate worse than IDS15K")
  }
}
