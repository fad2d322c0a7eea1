package repro.embed

import org.scalacheck.{Gen, Prop}
import org.scalatest.funsuite.AnyFunSuite
import repro.PropHelper

/** Unit + property tests for the vector primitives. */
class VecOpsSpec extends AnyFunSuite with PropHelper {

  private val genVec: Gen[Array[Float]] =
    Gen.choose(1, 16).flatMap(n => Gen.listOfN(n, Gen.choose(-5f, 5f)).map(_.toArray))

  test("manhattan on known vectors") {
    assert(VecOps.manhattan(Array(1f, 2f), Array(4f, 0f)) == 5.0)
    assert(VecOps.manhattan(Array(0f), Array(0f)) == 0.0)
  }

  test("manhattanSim is 1 at distance 0 and decreasing") {
    assert(VecOps.manhattanSim(Array(1f), Array(1f)) == 1.0)
    assert(VecOps.manhattanSim(Array(0f), Array(1f)) == 0.5)
    assert(VecOps.manhattanSim(Array(0f), Array(3f)) == 0.25)
  }

  test("property: manhattan is symmetric and non-negative") {
    checkProp(Prop.forAll(genVec) { a =>
      val b = a.map(x => -x)
      VecOps.manhattan(a, b) == VecOps.manhattan(b, a) && VecOps.manhattan(a, b) >= 0
    })
  }

  test("property: triangle inequality holds for manhattan") {
    checkProp(Prop.forAll(Gen.listOfN(8, Gen.choose(-3f, 3f))) { xs =>
      val a = xs.take(4).toArray.padTo(4, 0f)
      val b = xs.drop(4).toArray.padTo(4, 0f)
      val z = Array.fill(4)(0f)
      VecOps.manhattan(a, b) <= VecOps.manhattan(a, z) + VecOps.manhattan(z, b) + 1e-3
    })
  }

  test("normalize produces unit vectors (within eps)") {
    val v = VecOps.normalize(Array(3f, 4f))
    val norm = math.sqrt(v.map(x => x.toDouble * x).sum)
    assert(math.abs(norm - 1.0) < 1e-4)
  }

  test("normalize of zero vector stays finite (eps guard)") {
    val v = VecOps.normalize(Array(0f, 0f, 0f))
    assert(v.forall(x => !x.isNaN && !x.isInfinite))
  }

  test("addInPlace and axpy") {
    val a = Array(1f, 2f)
    VecOps.addInPlace(a, Array(3f, 4f))
    assert(a.toSeq == Seq(4f, 6f))
    VecOps.axpy(a, 2f, Array(1f, 1f))
    assert(a.toSeq == Seq(6f, 8f))
  }

  test("maxPoolInPlace keeps element-wise maxima") {
    val a = Array(1f, 5f, -2f)
    VecOps.maxPoolInPlace(a, Array(3f, 0f, -1f))
    assert(a.toSeq == Seq(3f, 5f, -1f))
  }

  test("hashGaussian is deterministic and seed-sensitive") {
    val a = VecOps.hashGaussian(42L, 32)
    val b = VecOps.hashGaussian(42L, 32)
    val c = VecOps.hashGaussian(43L, 32)
    assert(a.toSeq == b.toSeq)
    assert(a.toSeq != c.toSeq)
  }

  test("hashGaussian looks standard-normal-ish") {
    val v = (0 until 200).flatMap(i => VecOps.hashGaussian(i.toLong, 16))
    val mean = v.map(_.toDouble).sum / v.length
    val varr = v.map(x => (x - mean) * (x - mean)).sum / v.length
    assert(math.abs(mean) < 0.1, s"mean=$mean")
    assert(math.abs(varr - 1.0) < 0.2, s"var=$varr")
  }

  test("topK returns k best sorted desc with deterministic ties") {
    val s = Array(0.1, 0.9, 0.5, 0.9, 0.2)
    val top = VecOps.topK(s, 3)
    assert(top.map(_._1).toSeq == Seq(1, 3, 2)) // tie 0.9: lower index first
    assert(top.map(_._2).toSeq == Seq(0.9, 0.9, 0.5))
  }

  test("topK with k >= n returns all, sorted") {
    val top = VecOps.topK(Array(0.3, 0.1, 0.7), 10)
    assert(top.map(_._1).toSeq == Seq(2, 0, 1))
  }

  test("property: topK(k) equals sort-take-k") {
    checkProp(Prop.forAll(Gen.listOf(Gen.choose(0.0, 1.0)), Gen.choose(1, 10)) { (xs, k) =>
      val arr = xs.toArray
      val expect = arr.zipWithIndex.map { case (v, i) => (i, v) }
        .sortBy { case (i, v) => (-v, i) }.take(k).toSeq
      VecOps.topK(arr, k).toSeq == expect
    })
  }
}
