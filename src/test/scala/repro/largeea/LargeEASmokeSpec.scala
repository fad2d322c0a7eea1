package repro.largeea

import repro.SparkSpec
import repro.exp.Datasets
import repro.kg.KGGen
import repro.structure.GnnEA

/** End-to-end smoke: the full LargeEA pipeline on a tiny dataset. */
class LargeEASmokeSpec extends SparkSpec {

  test("LargeEA-R end-to-end on tiny dataset produces sane scores") {
    val ds = KGGen.generate(spark, Datasets.tiny())
    val res = LargeEA.run(spark, ds, LargeEA.Config(model = GnnEA.Rrea, k = 3))
    info(s"fused: ${res.scores.pretty}")
    info(s"structOnly: ${res.structOnly.map(_.pretty)}")
    info(s"nameOnly: ${res.nameOnly.map(_.pretty)}")
    info(s"pseudo=${res.pseudoSeedCount} prec=${res.pseudoSeedPrecision} seeds=${res.seedsUsed}")
    info(s"timings=${res.timings}")
    assert(res.scores.n == ds.testPairs.length)
    assert(res.scores.hits1 > 0.3, s"H@1 too low: ${res.scores.hits1}")
    assert(res.scores.hits5 >= res.scores.hits1)
    assert(res.scores.mrr >= res.scores.hits1 && res.scores.mrr <= 1.0)
  }
}
