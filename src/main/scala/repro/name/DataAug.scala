package repro.name

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import repro.sim.SimMatrix

/** Name-based data augmentation (paper §2.3).
  *
  * Inspired by cycle consistency in word translation: a pair (s, t) becomes
  * a *pseudo seed* iff t is s's most similar target under Mn AND s is t's
  * most similar source — mutual nearest neighbours. No human labels needed;
  * in the unsupervised case (§3.5) these pseudo seeds are the only seeds.
  */
object DataAug {

  /** Mutual-nearest-neighbour pseudo seeds from a name similarity matrix.
    * Returns a DataFrame (src, tgt).
    *
    * In addition to cycle consistency (mutual argmax), a pair must beat the
    * source row's runner-up by `margin` — the standard precision device in
    * unsupervised word translation; it prunes ambiguous matches the way
    * BERT's better-separated scores do for the paper (whose DA reaches
    * ~94 % precision).
    */
  def pseudoSeeds(mn: SimMatrix, margin: Double = 1.02): DataFrame = {
    // deterministic argmax per side: score desc, partner id asc
    val bySrc = Window.partitionBy("src").orderBy(col("score").desc, col("tgt").asc)
    val byTgt = Window.partitionBy("tgt").orderBy(col("score").desc, col("src").asc)
    val ranked = mn.df
      .withColumn("rs", row_number().over(bySrc))
      .withColumn("rt", row_number().over(byTgt))
    val second = ranked.where(col("rs") === 2)
      .select(col("src").as("s2src"), col("score").as("second"))
    ranked.where(col("rs") === 1 && col("rt") === 1)
      .join(second, col("src") === col("s2src"), "left")
      .where(col("second").isNull || col("score") >= col("second") * margin)
      .select("src", "tgt")
  }

  /** Merge real seeds with pseudo seeds, keeping the result 1-to-1:
    * real seeds win; a pseudo seed is dropped if either of its endpoints
    * already occurs in the merged set.
    */
  def mergeSeeds(
      real: Array[(Long, Long)],
      pseudo: Array[(Long, Long)]): Array[(Long, Long)] = {
    val usedSrc = scala.collection.mutable.Set[Long](real.map(_._1).toIndexedSeq: _*)
    val usedTgt = scala.collection.mutable.Set[Long](real.map(_._2).toIndexedSeq: _*)
    val out = scala.collection.mutable.ArrayBuffer[(Long, Long)](real.toIndexedSeq: _*)
    pseudo.foreach { case (s, t) =>
      if (!usedSrc.contains(s) && !usedTgt.contains(t)) {
        out += ((s, t)); usedSrc += s; usedTgt += t
      }
    }
    out.toArray
  }

  /** Precision of pseudo seeds against the full ground truth (§3.5 reports
    * 93.86 % / 93.85 % on DBP1M).
    */
  def precision(pseudo: Array[(Long, Long)], truth: Array[(Long, Long)]): Double = {
    if (pseudo.isEmpty) return 0.0
    val t = truth.toSet
    pseudo.count(t.contains).toDouble / pseudo.length
  }
}
