package repro.bench

import repro.SparkSpec
import repro.exp.{Datasets, Tables}

/** Reproduces Table 2 — overall EA results on IDS15K / IDS100K (lite).
  *
  * Paper numbers (H@1) for reference, recorded alongside ours in
  * EXPERIMENTS.md:
  *
  *            IDS15K-EN-FR  IDS15K-EN-DE  IDS100K-EN-FR  IDS100K-EN-DE
  * GCNAlign        33.8         48.1           23.0           31.7
  * MultiKE         74.9         75.6           62.9           66.8
  * RDGCN           75.5         83.0           64.0           72.2
  * RREA            80.8         85.8            -(OOM)         -(OOM)
  * BERT-INT        94.2         93.5           92.0           90.8
  * LargeEA-G       88.4/89.9    89.2/90.8      83.9/84.7      85.6/85.8
  * LargeEA-R       88.7/89.8    89.2/91.1      84.4/84.3      83.4/86.4
  *
  * Asserted shape: LargeEA > structure-only baselines; BERT-INT is the
  * accuracy leader but needs ~9× LargeEA's modeled memory and is the
  * slowest of the name-aware methods; RREA is OOM at the 100K tier.
  */
class Table2Bench extends SparkSpec {

  test("Table 2: overall EA results on IDS15K and IDS100K") {
    val rows = Tables.table2(spark)
    println("\n=== Table 2 (lite) — overall EA on IDS ===")
    println(Tables.renderEaRows(rows))

    def h1(ds: String, m: String): Double =
      rows.find(r => r.dataset == ds && r.method.startsWith(m)).get.h1
    def row(ds: String, m: String): Tables.EaRow =
      rows.find(r => r.dataset == ds && r.method.startsWith(m)).get

    val dsKeys = Datasets.idsSpecs.map(_.key)

    // 1. LargeEA variants beat the pure-structure baseline (GCNAlign) and
    //    the structure-only model they embed, everywhere.
    dsKeys.foreach { ds =>
      assert(h1(ds, "LargeEA-G") > h1(ds, "GCNAlign"),
        s"$ds: LargeEA-G=${h1(ds, "LargeEA-G")} GCNAlign=${h1(ds, "GCNAlign")}")
      assert(h1(ds, "LargeEA-R") > h1(ds, "GCNAlign"))
    }

    // 2. RREA is OOM at the 100K tier, runnable at 15K (paper's "-" cells).
    assert(!row("IDS15K-EN-FR", "RREA").oom)
    assert(row("IDS100K-EN-FR", "RREA").oom)
    assert(row("IDS100K-EN-DE", "RREA").oom)

    // 3. BERT-INT leads on accuracy on IDS (paper: 90.8–94.2 H@1): it beats
    //    every competitor on every dataset, and stays at/near the LargeEA
    //    variants on tier average (our lite LargeEA occasionally edges out
    //    BERT-INT-lite on single datasets — noted in EXPERIMENTS.md).
    dsKeys.foreach { ds =>
      val comps = rows.filter(r => r.dataset == ds && !r.oom &&
        Set("GCNAlign", "MultiKE", "RDGCN", "RREA").contains(r.method))
      assert(h1(ds, "BERT-INT") >= comps.map(_.h1).max,
        s"$ds: BERT-INT must beat all competitors")
    }
    val bertMean = dsKeys.map(ds => h1(ds, "BERT-INT")).sum / dsKeys.size
    val largeMean = dsKeys.map { ds =>
      rows.filter(r => r.dataset == ds && r.method.startsWith("LargeEA")).map(_.h1).max
    }.sum / dsKeys.size
    assert(bertMean >= largeMean - 0.06,
      s"BERT-INT mean $bertMean should be near the best-LargeEA mean $largeMean")

    // 4. ...but needs far more modeled GPU memory than LargeEA (paper: 9×).
    def gb(s: String): Double = s.stripSuffix("G").toDouble
    dsKeys.foreach { ds =>
      val bi = gb(row(ds, "BERT-INT").mem)
      val le = gb(row(ds, "LargeEA-G EN->L").mem)
      assert(bi / le >= 5, s"$ds: memory saving ${bi / le}x < 5x")
    }

    // 5. LargeEA is accurate in absolute terms on the lite sets.
    dsKeys.foreach { ds =>
      assert(h1(ds, "LargeEA-R") > 0.6, s"$ds: LargeEA-R H@1=${h1(ds, "LargeEA-R")}")
    }

    // 6. Direction influence on H@1 is small (paper: 0.1–3%).
    dsKeys.foreach { ds =>
      val fwd = rows.find(r => r.dataset == ds && r.method == "LargeEA-R EN->L").get.h1
      val rev = rows.find(r => r.dataset == ds && r.method == "LargeEA-R L->EN").get.h1
      assert(math.abs(fwd - rev) < 0.10, s"$ds: direction gap ${math.abs(fwd - rev)}")
    }
  }
}
