package repro.name

import org.apache.spark.sql.SparkSession
import repro.sim.SimMatrix

/** STNS — string-based name similarity (paper §2.3).
  *
  * Computing Levenshtein on all |Es|·|Et| pairs is infeasible, so the
  * paper first filters candidates with datasketch's MinHash-LSH, keeping
  * pairs with Jaccard ≥ θ (=0.5), then scores only those with Levenshtein.
  *
  * Pipeline (all Spark):
  *  1. MinHash signatures per name on both sides;
  *  2. banded LSH bucket join across the two KGs → candidate pairs;
  *  3. keep pairs with estimated Jaccard ≥ θ;
  *  4. score survivors with normalized Levenshtein similarity
  *     1 − lev(a,b)/max(|a|,|b|).
  */
object Stns {

  /** Exact Levenshtein distance (two-row DP). */
  def levenshtein(a: String, b: String): Int = {
    if (a.isEmpty) return b.length
    if (b.isEmpty) return a.length
    var prev = Array.tabulate(b.length + 1)(identity)
    var cur = new Array[Int](b.length + 1)
    var i = 1
    while (i <= a.length) {
      cur(0) = i
      var j = 1
      while (j <= b.length) {
        val cost = if (a.charAt(i - 1) == b.charAt(j - 1)) 0 else 1
        cur(j) = math.min(math.min(cur(j - 1) + 1, prev(j) + 1), prev(j - 1) + cost)
        j += 1
      }
      val tmp = prev; prev = cur; cur = tmp
      i += 1
    }
    prev(b.length)
  }

  /** Normalized Levenshtein similarity in [0, 1]. */
  def levenshteinSim(a: String, b: String): Double = {
    val m = math.max(a.length, b.length)
    if (m == 0) 1.0 else 1.0 - levenshtein(a, b).toDouble / m
  }

  /** Build Mst.
    *
    * @param srcNames id-indexed source entity names
    * @param tgtNames id-indexed target entity names
    * @param theta    Jaccard lower bound θ (paper: 0.5)
    */
  def similarity(
      spark: SparkSession,
      srcNames: Array[String],
      tgtNames: Array[String],
      theta: Double = 0.5,
      lsh: MinHashLsh = new MinHashLsh()): SimMatrix = {
    import spark.implicits._
    val sc = spark.sparkContext
    val bcLsh = sc.broadcast(lsh)

    def sigRdd(names: Array[String]) =
      sc.parallelize(names.zipWithIndex.toIndexedSeq,
                     math.min(32, math.max(1, names.length / 512)))
        .map { case (nm, id) => (id, bcLsh.value.signature(nm)) }
        .cache()

    val srcSig = sigRdd(srcNames)
    val tgtSig = sigRdd(tgtNames)

    // LSH bucket join: (bandKey) -> ids, joined across the two sides.
    val srcBuckets = srcSig.flatMap { case (id, sig) => bcLsh.value.bandKeys(sig).map(k => (k, id)) }
    val tgtBuckets = tgtSig.flatMap { case (id, sig) => bcLsh.value.bandKeys(sig).map(k => (k, id)) }
    val candidates = srcBuckets.join(tgtBuckets).map(_._2).distinct()

    // θ filter on estimated Jaccard, then Levenshtein on survivors.
    val bcSrcNames = sc.broadcast(srcNames)
    val bcTgtNames = sc.broadcast(tgtNames)
    val srcSigMap = sc.broadcast(srcSig.collectAsMap())
    val tgtSigMap = sc.broadcast(tgtSig.collectAsMap())

    val scored = candidates.flatMap { case (s, t) =>
      val l = bcLsh.value
      val j = l.estJaccard(srcSigMap.value(s), tgtSigMap.value(t))
      if (j >= theta) {
        val sim = levenshteinSim(bcSrcNames.value(s), bcTgtNames.value(t))
        Some((s.toLong, t.toLong, sim))
      } else None
    }

    val out = SimMatrix(scored.toDF("src", "tgt", "score"))
    srcSig.unpersist(); tgtSig.unpersist()
    out
  }
}
