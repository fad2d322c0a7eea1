package repro.embed

/** Dense float-vector primitives shared by both channels.
  *
  * All similarity in the paper is Manhattan-distance based; we convert a
  * distance d to a similarity 1/(1+d) so channel fusion can add scores.
  */
object VecOps {

  /** L1 (Manhattan) distance. */
  def manhattan(a: Array[Float], b: Array[Float]): Double = {
    var s = 0.0
    var i = 0
    while (i < a.length) { s += math.abs(a(i) - b(i)); i += 1 }
    s
  }

  /** Similarity in (0, 1] derived from Manhattan distance. */
  def manhattanSim(a: Array[Float], b: Array[Float]): Double =
    1.0 / (1.0 + manhattan(a, b))

  /** L2-normalize in place with the paper's ε guard: h ← h / (‖h‖₂ + ε). */
  def normalize(v: Array[Float], eps: Double = 1e-8): Array[Float] = {
    var s = 0.0
    var i = 0
    while (i < v.length) { s += v(i).toDouble * v(i); i += 1 }
    val inv = (1.0 / (math.sqrt(s) + eps)).toFloat
    i = 0
    while (i < v.length) { v(i) *= inv; i += 1 }
    v
  }

  /** Cap the L2 norm at `maxNorm` in place: scales down, never up.
    * (Propagation uses this instead of full normalization so ε-scale
    * noise is never inflated to signal magnitude.)
    */
  def capNorm(v: Array[Float], maxNorm: Double = 1.0): Array[Float] = {
    var s = 0.0
    var i = 0
    while (i < v.length) { s += v(i).toDouble * v(i); i += 1 }
    val norm = math.sqrt(s)
    if (norm > maxNorm) {
      val inv = (maxNorm / norm).toFloat
      i = 0
      while (i < v.length) { v(i) *= inv; i += 1 }
    }
    v
  }

  /** a += b (in place). */
  def addInPlace(a: Array[Float], b: Array[Float]): Unit = {
    var i = 0
    while (i < a.length) { a(i) += b(i); i += 1 }
  }

  /** a += s·b (in place). */
  def axpy(a: Array[Float], s: Float, b: Array[Float]): Unit = {
    var i = 0
    while (i < a.length) { a(i) += s * b(i); i += 1 }
  }

  /** Element-wise max-pool accumulate: a(i) = max(a(i), b(i)). */
  def maxPoolInPlace(a: Array[Float], b: Array[Float]): Unit = {
    var i = 0
    while (i < a.length) { if (b(i) > a(i)) a(i) = b(i); i += 1 }
  }

  /** Deterministic pseudo-Gaussian vector seeded by a long (Box–Muller over
    * a splitmix64 stream) — stands in for learned/pretrained parameters.
    */
  def hashGaussian(seed: Long, dim: Int): Array[Float] = {
    var x = seed
    def next(): Long = {
      x += 0x9e3779b97f4a7c15L
      var z = x
      z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
      z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
      z ^ (z >>> 31)
    }
    def u01(): Double = (next() >>> 11) * (1.0 / (1L << 53))
    val out = new Array[Float](dim)
    var i = 0
    while (i < dim) {
      val u1 = math.max(u01(), 1e-12)
      val u2 = u01()
      val r = math.sqrt(-2.0 * math.log(u1))
      out(i) = (r * math.cos(2 * math.Pi * u2)).toFloat
      if (i + 1 < dim) out(i + 1) = (r * math.sin(2 * math.Pi * u2)).toFloat
      i += 2
    }
    out
  }

  /** Exact top-k by descending score with a bounded min-heap; ties broken by
    * lower index for determinism. Returns (index, score) sorted desc.
    */
  def topK(scores: Array[Double], k: Int): Array[(Int, Double)] = {
    val pq = new scala.collection.mutable.PriorityQueue[(Int, Double)]()(
      Ordering.by[(Int, Double), (Double, Int)] { case (i, s) => (-s, i) })
    var i = 0
    while (i < scores.length) {
      if (pq.size < k) pq.enqueue((i, scores(i)))
      else if (scores(i) > pq.head._2 ||
               (scores(i) == pq.head._2 && i < pq.head._1)) {
        pq.dequeue(); pq.enqueue((i, scores(i)))
      }
      i += 1
    }
    pq.dequeueAll.toArray.reverse
  }
}
