package repro.bench

import repro.SparkSpec
import repro.exp.{Datasets, Tables}

/** Reproduces Table 1 — statistics of the (lite) datasets.
  *
  * Paper (full scale)          | Ours (lite, ×10 / ×100 down)
  * ----------------------------|------------------------------
  * IDS15K  EN-FR 15,000-15,000 | 1,500-1,500
  * IDS100K EN-FR 100,000-...   | 5,000-5,000
  * DBP1M   EN-FR 1.88M-1.37M   | ~12,000-9,000 (asymmetric, unknowns)
  *
  * The bench asserts the *shape*: per-tier size ordering, the EN>L entity
  * asymmetry and the EN-denser triple ratios of DBP1M.
  */
class Table1Bench extends SparkSpec {

  test("Table 1: dataset statistics") {
    val rows = Tables.table1(spark)
    println("\n=== Table 1 (lite) — dataset statistics ===")
    println(Tables.renderTable1(rows))

    val byKey = rows.map(r => r.dataset -> r).toMap

    // size ordering across tiers
    assert(byKey("IDS15K-EN-FR").srcEnts < byKey("IDS100K-EN-FR").srcEnts)
    assert(byKey("IDS100K-EN-FR").srcEnts < byKey("DBP1M-EN-FR").srcEnts)

    // IDS is symmetric, DBP1M is not (EN side larger, as in the paper)
    Datasets.idsSpecs.foreach { s =>
      assert(byKey(s.key).srcEnts == byKey(s.key).tgtEnts, s.key)
    }
    Datasets.dbpSpecs.foreach { s =>
      assert(byKey(s.key).srcEnts > byKey(s.key).tgtEnts, s.key)
    }

    // DBP1M: EN side much denser in triples (paper: 7.0M vs 3.0M, 6.2M vs 2.0M)
    Datasets.dbpSpecs.foreach { s =>
      val r = byKey(s.key)
      assert(r.srcTriples.toDouble / r.tgtTriples > 1.5,
        s"${s.key}: EN triples should dominate (${r.srcTriples} vs ${r.tgtTriples})")
    }

    // relation vocabularies: source richer than target, as in Table 1
    rows.foreach(r => assert(r.srcRels >= r.tgtRels, r.dataset))
  }
}
