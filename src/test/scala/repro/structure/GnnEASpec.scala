package repro.structure

import org.scalatest.funsuite.AnyFunSuite
import repro.embed.VecOps

/** Unit tests for the training-free GNN EA model. */
class GnnEASpec extends AnyFunSuite {

  // A small graph: 0-1-2-3 chain plus 1-4
  private val triples = Array((0, 0, 1), (1, 0, 2), (2, 1, 3), (1, 1, 4))

  test("deterministic embeddings") {
    val a = GnnEA.embed(5, triples, Map(0 -> 1L), GnnEA.Rrea, 7L)
    val b = GnnEA.embed(5, triples, Map(0 -> 1L), GnnEA.Rrea, 7L)
    assert(a.zip(b).forall { case (x, y) => x.toSeq == y.toSeq })
  }

  test("output dimension: GCN = dim, RREA = dim*(layers+1)") {
    val g = GnnEA.embed(5, triples, Map(), GnnEA.Gcn, 1L)
    val r = GnnEA.embed(5, triples, Map(), GnnEA.Rrea, 1L)
    assert(g.head.length == GnnEA.Gcn.dim)
    assert(r.head.length == GnnEA.Rrea.dim * (GnnEA.Rrea.layers + 1))
  }

  test("all embeddings are unit-norm") {
    val h = GnnEA.embed(5, triples, Map(2 -> 5L), GnnEA.Rrea, 3L)
    h.foreach { v =>
      val n = math.sqrt(v.map(x => x.toDouble * x).sum)
      assert(math.abs(n - 1.0) < 1e-3)
    }
  }

  test("isomorphic graphs with shared seed anchors align perfectly") {
    // same chain on both "sides", seeds at both ends, query the middle
    val chain = Array((0, 0, 1), (1, 0, 2), (2, 0, 3), (3, 0, 4))
    val anchors = Map(0 -> 100L, 4 -> 200L)
    val hs = GnnEA.embed(5, chain, anchors, GnnEA.Rrea, sideSalt = 1L)
    val ht = GnnEA.embed(5, chain, anchors, GnnEA.Rrea, sideSalt = 2L)
    // entity i on side s must be closest to entity i on side t
    (0 until 5).foreach { i =>
      val dists = (0 until 5).map(j => VecOps.manhattan(hs(i), ht(j)))
      assert(dists.indexOf(dists.min) == i, s"entity $i misaligned: $dists")
    }
  }

  test("seeded entity is closest to its counterpart even with different noise") {
    // RREA (layer concat) keeps layer-0 information, so the anchored entity
    // stays distinguishable from its neighbours after propagation; plain
    // GCN smears the anchor over the 1-hop neighbourhood (that coarseness
    // is exactly why GCN-Align scores low in the paper).
    val anchors = Map(1 -> 42L)
    val a = GnnEA.embed(5, triples, anchors, GnnEA.Rrea, 11L)
    val b = GnnEA.embed(5, triples, anchors, GnnEA.Rrea, 22L)
    val d = (0 until 5).map(j => VecOps.manhattan(a(1), b(j)))
    assert(d.indexOf(d.min) == 1)
  }

  test("no anchors -> embeddings are pure noise, sides disagree") {
    val a = GnnEA.embed(3, Array((0, 0, 1), (1, 0, 2)), Map(), GnnEA.Gcn, 1L)
    val b = GnnEA.embed(3, Array((0, 0, 1), (1, 0, 2)), Map(), GnnEA.Gcn, 2L)
    // distances should be large and unstructured (no shared signal)
    val d01 = VecOps.manhattan(a(0), b(0))
    assert(d01 > 0.5, s"uncorrelated noise should be distant, got $d01")
  }

  test("relation weighting changes RREA embeddings but not GCN's") {
    val t1 = Array((0, 0, 1), (1, 0, 2), (2, 0, 3))
    val t2 = Array((0, 0, 1), (1, 1, 2), (2, 2, 3)) // same edges, different relations
    val anchors = Map(0 -> 9L)
    val r1 = GnnEA.embed(4, t1, anchors, GnnEA.Rrea, 5L)
    val r2 = GnnEA.embed(4, t2, anchors, GnnEA.Rrea, 5L)
    assert(r1(1).toSeq != r2(1).toSeq, "RREA is relation-aware")
    val g1 = GnnEA.embed(4, t1, anchors, GnnEA.Gcn, 5L)
    val g2 = GnnEA.embed(4, t2, anchors, GnnEA.Gcn, 5L)
    assert(g1(1).toSeq == g2(1).toSeq, "GCN ignores relation types")
  }

  test("self-loops are ignored") {
    val a = GnnEA.embed(2, Array((0, 0, 1)), Map(0 -> 1L), GnnEA.Gcn, 3L)
    val b = GnnEA.embed(2, Array((0, 0, 1), (1, 0, 1)), Map(0 -> 1L), GnnEA.Gcn, 3L)
    assert(a.zip(b).forall { case (x, y) => x.toSeq == y.toSeq })
  }

  test("empty graph still produces valid embeddings") {
    val h = GnnEA.embed(3, Array.empty, Map(1 -> 3L), GnnEA.Rrea, 1L)
    assert(h.length == 3)
    assert(h.forall(_.forall(x => !x.isNaN)))
  }

  test("anchor influence propagates with distance decay") {
    // star: 0 anchored; 1 adjacent; 4 two hops away
    val star = Array((0, 0, 1), (1, 0, 2), (2, 0, 3), (3, 0, 4))
    val hs = GnnEA.embed(5, star, Map(0 -> 77L), GnnEA.Rrea, 1L)
    val ht = GnnEA.embed(5, star, Map(0 -> 77L), GnnEA.Rrea, 2L)
    val dNear = VecOps.manhattan(hs(1), ht(1))
    val dFar = VecOps.manhattan(hs(4), ht(4))
    assert(dNear < dFar, s"near=$dNear far=$dFar: signal should decay with distance")
  }
}
