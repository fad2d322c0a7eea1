package repro.name

import org.scalacheck.{Gen, Prop}
import org.scalatest.funsuite.AnyFunSuite
import repro.PropHelper

/** Unit + property tests for the datasketch substitute. */
class MinHashLshSpec extends AnyFunSuite with PropHelper {

  private val lsh = new MinHashLsh()

  test("shingles of short and normal strings") {
    assert(lsh.shingles("ab").size == 1)
    assert(lsh.shingles("abcd").size == 2) // abc, bcd
    assert(lsh.shingles("aaaa").size == 1) // identical shingles collapse
  }

  test("identical strings have identical signatures and estJaccard 1") {
    val a = lsh.signature("bonjour le monde")
    val b = lsh.signature("bonjour le monde")
    assert(a.toSeq == b.toSeq)
    assert(lsh.estJaccard(a, b) == 1.0)
  }

  test("disjoint strings have near-zero estimated jaccard") {
    val a = lsh.signature("aaaaaaaaaa")
    val b = lsh.signature("zzzzzzzzzz")
    assert(lsh.estJaccard(a, b) < 0.1)
  }

  test("estimate tracks true jaccard within MinHash error") {
    val pairs = Seq(
      ("kamoti velsu dorne", "kamoti velsu dorn"),
      ("kamoti velsu dorne", "kamoti welsu dorne"),
      ("abcdefghij", "abcdefghzz"),
      ("entity number one", "entity number two"))
    pairs.foreach { case (x, y) =>
      val est = lsh.estJaccard(lsh.signature(x), lsh.signature(y))
      val tru = lsh.trueJaccard(x, y)
      assert(math.abs(est - tru) < 0.2, s"($x,$y): est=$est true=$tru")
    }
  }

  test("property: estimate within 0.25 of truth for random-ish strings") {
    val genWord = Gen.listOfN(12, Gen.alphaLowerChar).map(_.mkString)
    checkProp(Prop.forAll(genWord, genWord) { (a, b) =>
      val ab = a + b.take(6) // overlapping pair
      val est = lsh.estJaccard(lsh.signature(a), lsh.signature(ab))
      math.abs(est - lsh.trueJaccard(a, ab)) < 0.25
    }, minSuccessful = 25)
  }

  test("band keys collide for identical strings") {
    val a = lsh.bandKeys(lsh.signature("hello world"))
    val b = lsh.bandKeys(lsh.signature("hello world"))
    assert(a.toSeq == b.toSeq)
    assert(a.length == lsh.bands)
  }

  test("similar strings share at least one band (LSH recall at J>=0.5)") {
    // J(kamoti velsu, kamoti velsu!) ~ high
    var hits = 0
    val cases = Seq(
      ("kamoti velsu dorne", "kamoti velsu dorn"),
      ("bonjour tout le monde", "bonjour tout le mond"),
      ("warden of the north", "warden of the nort"),
      ("abcdefghijklmnop", "abcdefghijklmnoq"))
    cases.foreach { case (x, y) =>
      val shared = lsh.bandKeys(lsh.signature(x)).toSet
        .intersect(lsh.bandKeys(lsh.signature(y)).toSet)
      if (shared.nonEmpty) hits += 1
    }
    assert(hits >= 3, s"only $hits/4 high-jaccard pairs collided in LSH")
  }

  test("dissimilar strings rarely share a band") {
    val r = new scala.util.Random(11)
    def word() = (0 until 15).map(_ => ('a' + r.nextInt(26)).toChar).mkString
    var collisions = 0
    (0 until 50).foreach { _ =>
      val a = lsh.bandKeys(lsh.signature(word())).toSet
      val b = lsh.bandKeys(lsh.signature(word())).toSet
      if (a.intersect(b).nonEmpty) collisions += 1
    }
    assert(collisions <= 3, s"$collisions/50 random pairs collided")
  }

  test("numPerm must be divisible by bands") {
    intercept[IllegalArgumentException](new MinHashLsh(numPerm = 100, bands = 32))
  }

  test("trueJaccard basics") {
    assert(lsh.trueJaccard("abc", "abc") == 1.0)
    assert(lsh.trueJaccard("abc", "xyz") == 0.0)
  }
}
