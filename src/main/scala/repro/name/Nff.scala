package repro.name

import org.apache.spark.sql.SparkSession
import repro.embed.PseudoBert
import repro.kg.EaDataset
import repro.sim.SimMatrix

/** NFF — name feature fusion (paper §2.3): Mn = Mse + γ·Mst.
  *
  * γ ∈ (0,1] weights the string similarity; the paper sets γ = 0.05
  * because semantic features dominate in entity matching.
  */
object Nff {

  final case class Result(mse: SimMatrix, mst: SimMatrix, mn: SimMatrix)

  /** Compute the fused name similarity matrix for a dataset.
    *
    * @param phi   top-k kept in the semantic matrix (paper φ = 50)
    * @param theta Jaccard lower bound for the string channel (paper 0.5)
    * @param gamma string-channel weight (paper 0.05)
    */
  def compute(
      spark: SparkSession,
      ds: EaDataset,
      phi: Int = 50,
      theta: Double = 0.5,
      gamma: Double = 0.05,
      segments: Int = 4,
      dim: Int = 64): Result = {
    val srcNames = ds.source.namesArray
    val tgtNames = ds.target.namesArray
    val bert = new PseudoBert(ds.lexicon, dim)
    val srcVecs = bert.embedAll(srcNames)
    val tgtVecs = bert.embedAll(tgtNames)

    val mse = Sens.similarity(spark, srcVecs, tgtVecs, phi, segments).cache()
    val mst = Stns.similarity(spark, srcNames, tgtNames, theta).cache()
    val mn  = mse.plus(mst, gamma).cache()
    Result(mse, mst, mn)
  }
}
