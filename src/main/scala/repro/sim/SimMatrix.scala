package repro.sim

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** A sparse entity-similarity matrix as a DataFrame (src, tgt, score).
  *
  * Both channels produce one of these (the paper's Ms and Mn); fusion is
  * score addition over the union of supports (absent cells are 0), which
  * mirrors M = Ms + Mn / Mn = Mse + γ·Mst.
  */
final case class SimMatrix(df: DataFrame) {

  /** this + weight·other, fused over the union of supports. */
  def plus(other: SimMatrix, weight: Double = 1.0): SimMatrix = {
    val scaled = other.df.select(col("src"), col("tgt"), (col("score") * weight).as("score"))
    SimMatrix(
      df.unionByName(scaled)
        .groupBy("src", "tgt")
        .agg(sum("score").as("score")))
  }

  /** Keep only the k best targets per source entity (memory bound O(k|Es|),
    * the paper's argument for top-k retention).
    */
  def topK(k: Int): SimMatrix = {
    val w = Window.partitionBy("src").orderBy(col("score").desc, col("tgt").asc)
    SimMatrix(
      df.withColumn("rn", row_number().over(w)).where(col("rn") <= k).drop("rn"))
  }

  /** Number of stored cells. */
  def nnz: Long = df.count()

  def cache(): SimMatrix = { df.cache(); df.count(); this }
  def unpersist(): Unit = df.unpersist()

  /** Rows as a driver-side map src -> sorted (tgt, score) desc. */
  def collectRows(): Map[Long, Array[(Long, Double)]] =
    df.select("src", "tgt", "score").collect()
      .map(r => (r.getLong(0), r.getLong(1), r.getDouble(2)))
      .groupBy(_._1)
      .map { case (s, arr) =>
        s -> arr.map(x => (x._2, x._3)).sortBy { case (t, sc) => (-sc, t) }
      }
}

object SimMatrix {

  /** Build from driver-side sparse rows. */
  def fromLocal(spark: SparkSession, rows: Iterable[(Long, Long, Double)]): SimMatrix = {
    import spark.implicits._
    SimMatrix(rows.toSeq.toDF("src", "tgt", "score"))
  }

  /** The empty matrix. */
  def empty(spark: SparkSession): SimMatrix = fromLocal(spark, Nil)
}
