package repro.bench

import repro.SparkSpec
import repro.exp.Tables

/** Reproduces Table 3 — overall EA on DBP1M (lite), supervised.
  *
  * Paper H@1: LargeEA-G 51.8/50.6 (EN-FR), 55.3/55.5 (EN-DE);
  *            LargeEA-R 52.8/51.5 (EN-FR), 56.1/56.2 (EN-DE).
  * No competitor rows: they all exceed the testbed's memory.
  *
  * Asserted shape: every competitor is OOM under the memory model at
  * DBP1M scale; LargeEA runs and lands mid-range accuracy (well below its
  * IDS numbers — unknown entities + heterogeneity), EN-DE ≥ EN-FR-ish.
  */
class Table3Bench extends SparkSpec {

  test("Table 3: overall EA results on DBP1M") {
    val (largeRows, competitorRows) = Tables.table3(spark)
    println("\n=== Table 3 (lite) — overall EA on DBP1M ===")
    println(Tables.renderEaRows(largeRows))
    println("--- competitors at represented scale (memory model) ---")
    println(Tables.renderEaRows(competitorRows))

    // all five competitors OOM on both DBP1M datasets (the paper's reason
    // for their absence from Table 3)
    assert(competitorRows.size == 10)
    assert(competitorRows.forall(_.oom), "every competitor must be OOM on DBP1M")

    // LargeEA runs everywhere, with the paper's mid-range accuracy band
    assert(largeRows.size == 8)
    largeRows.foreach { r =>
      assert(!r.oom, s"${r.dataset} ${r.method} should fit")
      assert(r.h1 > 0.25 && r.h1 < 0.95,
        s"${r.dataset} ${r.method}: H@1=${r.h1} out of the plausible band")
      assert(r.h5 >= r.h1 && r.mrr >= r.h1 - 1e-9)
    }

    // accuracy is clearly below the IDS15K tier (paper: ~52-56 vs ~89-91)
    val best = largeRows.map(_.h1).max
    assert(best < 0.9, s"DBP1M-lite should be much harder than IDS (best=$best)")
  }
}
