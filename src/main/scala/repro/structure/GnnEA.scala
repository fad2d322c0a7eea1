package repro.structure

import repro.embed.VecOps
import scala.collection.mutable

/** Training-free GNN-style EA embeddings (structure channel model).
  *
  * Stands in for the gradient-trained GCN-Align / RREA variants (see
  * DESIGN.md §2). Each seed pair (s, t) receives one shared random anchor
  * vector on both sides; L rounds of symmetric degree-normalized neighbour
  * aggregation propagate the anchors through each KG independently:
  *
  *   h⁰(e)   = anchor(e) + ε·noise(e)
  *   hˡ(e)   = normalize( α·hˡ⁻¹(e) + Σ_{(e,r,u)} w_r/√(d_e·d_u) · hˡ⁻¹(u) )
  *   final e = normalize( concat(h⁰(e) … h^L(e)) )      (RREA-style)
  *
  * Equivalent entities whose neighbourhoods contain the same seeds end up
  * with similar aggregates — exactly the fixed point the triplet loss pulls
  * GNN EA models toward. The two configs mirror the two models the paper
  * plugs in:
  *  - GCN  (GCN-Align variant): 2 layers, uniform relation weights, final
  *    layer only (vanilla GCN has no relation modelling / no concat);
  *  - RREA: 3 layers, inverse-log relation-frequency weights (a cheap
  *    stand-in for relational reflection) and layer concatenation.
  */
object GnnEA {

  /** Model configuration. */
  final case class Config(
      name: String,
      dim: Int,
      layers: Int,
      relWeighted: Boolean,
      concatLayers: Boolean,
      bootstrapRounds: Int = 0, // self-training: mutual-NN pairs → new anchors
      selfWeight: Float = 1.0f,
      noiseEps: Float = 0.02f)

  /** The GCN-Align-like variant. */
  val Gcn: Config = Config("GCN", dim = 48, layers = 2, relWeighted = false, concatLayers = false)

  /** The RREA-like variant (stronger: more hops, relation weighting,
    * multi-scale concat, one bootstrap round — RREA trains iteratively
    * with self-sampled pairs).
    */
  val Rrea: Config = Config("RREA", dim = 48, layers = 3, relWeighted = true,
    concatLayers = true, bootstrapRounds = 2)

  /** Compute embeddings for one KG (or subgraph).
    *
    * @param n        entity count; entity ids are 0..n-1 (local)
    * @param triples  (h, r, t) with local ids
    * @param anchors  local entity id -> shared anchor seed (same value on
    *                 both sides of a seed pair); entities without a seed
    *                 are absent
    * @param sideSalt distinct per side so the ε-noise is uncorrelated
    */
  def embed(
      n: Int,
      triples: Array[(Int, Int, Int)],
      anchors: Map[Int, Long],
      cfg: Config,
      sideSalt: Long): Array[Array[Float]] = {

    // ---- adjacency with relation weights (undirected propagation) --------
    val relFreq = mutable.LongMap.empty[Int]
    triples.foreach { case (_, r, _) => relFreq(r.toLong) = relFreq.getOrElse(r.toLong, 0) + 1 }
    def relW(r: Int): Float =
      if (cfg.relWeighted) (1.0 / math.log(2.0 + relFreq(r.toLong))).toFloat else 1.0f

    val deg = new Array[Int](n)
    triples.foreach { case (h, _, t) => if (h != t) { deg(h) += 1; deg(t) += 1 } }

    val adjN = Array.fill(n)(new mutable.ArrayBuffer[Int]())
    val adjW = Array.fill(n)(new mutable.ArrayBuffer[Float]())
    triples.foreach { case (h, r, t) =>
      if (h != t) {
        val w = relW(r) / math.sqrt(math.max(1, deg(h)).toDouble * math.max(1, deg(t))).toFloat
        adjN(h) += t; adjW(h) += w
        adjN(t) += h; adjW(t) += w
      }
    }

    // ---- layer 0: anchors + tiny deterministic noise ----------------------
    // Seeded entities start at their (unit-norm) shared anchor; unseeded
    // entities start at ε-scale noise. Normalizing the unseeded vectors
    // here would inflate the noise to the anchors' magnitude and drown the
    // alignment signal — only the seeded vectors are re-normalized.
    var h = Array.tabulate(n) { e =>
      val noise = VecOps.hashGaussian(sideSalt ^ (e * 0x7f4a7c15L + 0x1234), cfg.dim)
      anchors.get(e) match {
        case Some(seedId) =>
          val v = VecOps.hashGaussian(0x51ed270b ^ seedId * 0x9e3779b9L, cfg.dim)
          VecOps.axpy(v, cfg.noiseEps, noise)
          VecOps.normalize(v)
        case None =>
          VecOps.normalize(noise)
          noise.map(x => x * cfg.noiseEps)
      }
    }
    val layerOutputs = mutable.ArrayBuffer[Array[Array[Float]]]()
    if (cfg.concatLayers) layerOutputs += h

    // ---- propagation -------------------------------------------------------
    var l = 0
    while (l < cfg.layers) {
      val next = new Array[Array[Float]](n)
      var e = 0
      while (e < n) {
        val acc = new Array[Float](cfg.dim)
        VecOps.axpy(acc, cfg.selfWeight, h(e))
        val ns = adjN(e); val ws = adjW(e)
        var j = 0
        while (j < ns.length) { VecOps.axpy(acc, ws(j), h(ns(j))); j += 1 }
        // cap, don't normalize: inflating a weak-signal vector to unit norm
        // would turn noise into (fake) signal for the next hop
        next(e) = VecOps.capNorm(acc)
        e += 1
      }
      h = next
      if (cfg.concatLayers) layerOutputs += h
      l += 1
    }

    // ---- output: concat layers (RREA) or final layer (GCN), unit-norm ----
    if (!cfg.concatLayers) h.map(v => VecOps.normalize(v.clone()))
    else {
      val parts = layerOutputs.toArray
      Array.tabulate(n) { e =>
        val out = new Array[Float](cfg.dim * parts.length)
        var p = 0
        while (p < parts.length) {
          System.arraycopy(parts(p)(e), 0, out, p * cfg.dim, cfg.dim)
          p += 1
        }
        VecOps.normalize(out)
      }
    }
  }
}
