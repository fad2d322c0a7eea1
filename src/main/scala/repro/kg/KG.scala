package repro.kg

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** A knowledge graph G = (E, R, T) held as Spark DataFrames.
  *
  * Schemas:
  *  - `entities`: (id: Long, name: String) — every entity has a name
  *    (the paper's name channel assumes this).
  *  - `triples` : (h: Long, r: Int, t: Long) — directed edges h --r--> t.
  *
  * Entity ids are dense 0..n-1 within one KG, which lets algorithm code
  * collect per-KG arrays without an id-compaction pass.
  */
final case class KG(lang: String, entities: DataFrame, triples: DataFrame) {

  /** Number of entities |E|. */
  lazy val numEntities: Long = entities.count()

  /** Number of distinct relations |R|. */
  lazy val numRelations: Long = triples.select("r").distinct().count()

  /** Number of triples |T|. */
  lazy val numTriples: Long = triples.count()

  /** Entity names as a driver-side array indexed by entity id. */
  def namesArray: Array[String] = {
    val n = numEntities.toInt
    val out = new Array[String](n)
    entities.select("id", "name").collect().foreach { r =>
      out(r.getLong(0).toInt) = r.getString(1)
    }
    out
  }

  /** Undirected weighted edge list (u, v, w=1.0) with u < v, parallel edges
    * collapsed. This is the input shape for the METIS substitute.
    */
  def undirectedEdges: DataFrame = {
    val t = triples
      .select(least(col("h"), col("t")).as("u"), greatest(col("h"), col("t")).as("v"))
      .where(col("u") =!= col("v"))
      .distinct()
    t.withColumn("w", lit(1.0))
  }
}

object KG {

  /** Build a KG from driver-side arrays (used by the generator and tests). */
  def fromLocal(
      spark: SparkSession,
      lang: String,
      names: Array[String],
      triples: Array[(Long, Int, Long)]): KG = {
    import spark.implicits._
    val ents = names.zipWithIndex.map { case (nm, i) => (i.toLong, nm) }.toSeq
      .toDF("id", "name")
    val trip = triples.toSeq.toDF("h", "r", "t")
    KG(lang, ents, trip)
  }
}

/** A cross-lingual EA dataset: source KG, target KG, ground-truth 1-to-1
  * alignment, and a train/test split of it (seed ratio per the paper: 20 %).
  *
  *  - `truth`: (src: Long, tgt: Long) — full EA ground truth ψ.
  *  - `train`: seed alignment ψ′ ⊂ ψ given to the model.
  *  - `test` : ψ \ ψ′, used only for evaluation.
  *
  * `lexicon` maps every foreign-language token surface to its canonical
  * (English) token surface. It stands in for the *pretrained* cross-lingual
  * knowledge of multilingual BERT (token-level, not entity-level — see
  * DESIGN.md §2); it is consumed by `repro.embed.PseudoBert`.
  */
final case class EaDataset(
    name: String,
    source: KG,
    target: KG,
    truth: DataFrame,
    train: DataFrame,
    test: DataFrame,
    lexicon: Map[String, String]) {

  /** Swap source and target (the paper's EN→L vs L→EN directions). */
  def reversed: EaDataset = {
    def flip(df: DataFrame): DataFrame =
      df.select(col("tgt").as("src"), col("src").as("tgt"))
    EaDataset(s"$name-rev", target, source, flip(truth), flip(train), flip(test), lexicon)
  }

  /** Truth pairs as a driver-side array. */
  def truthPairs: Array[(Long, Long)] = collectPairs(truth)
  def trainPairs: Array[(Long, Long)] = collectPairs(train)
  def testPairs: Array[(Long, Long)]  = collectPairs(test)

  // Sorted so downstream algorithms (seed round-robin, CPS hub picks,
  // anchor ids) see a run-to-run deterministic order — DataFrame collect
  // order is not guaranteed across shuffles.
  private def collectPairs(df: DataFrame): Array[(Long, Long)] =
    df.select("src", "tgt").collect().map(r => (r.getLong(0), r.getLong(1))).sorted
}
