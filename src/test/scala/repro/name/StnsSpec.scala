package repro.name

import org.scalacheck.{Gen, Prop}
import repro.{Oracle, PropHelper, SparkSpec}
import org.apache.spark.sql.functions._

/** Unit tests for STNS: Levenshtein (DuckDB-oracled) + LSH-filtered matrix. */
class StnsSpec extends SparkSpec with PropHelper {

  test("levenshtein on known cases") {
    assert(Stns.levenshtein("kitten", "sitting") == 3)
    assert(Stns.levenshtein("", "abc") == 3)
    assert(Stns.levenshtein("abc", "") == 3)
    assert(Stns.levenshtein("abc", "abc") == 0)
    assert(Stns.levenshtein("flaw", "lawn") == 2)
  }

  test("levenshtein agrees with DuckDB's levenshtein() on word pairs") {
    import spark.implicits._
    // ASCII only: DuckDB's levenshtein counts UTF-8 *bytes*, ours counts
    // characters ('é' = 2 bytes ⇒ off-by-one there); our char-level
    // semantics matches python-Levenshtein, which the paper uses.
    val pairs = Seq(
      ("kamoti", "quamote"), ("velsu dorne", "velsue dorn"), ("a", "b"),
      ("bonjour", "bonsoir"), ("same", "same"), ("", "x"), ("rankalo", "ranqualo"))
    val df = pairs.toDF("a", "b")
    val got = df.select(col("a"), col("b"),
      udf((x: String, y: String) => Stns.levenshtein(x, y)).apply(col("a"), col("b"))
        .cast("string").as("d"))
    Oracle.assertEquivalent(
      got,
      "SELECT a, b, CAST(levenshtein(a, b) AS VARCHAR) AS d FROM pairs",
      "pairs" -> df)
  }

  test("property: levenshtein symmetry and identity") {
    val word = Gen.listOfN(8, Gen.alphaLowerChar).map(_.mkString)
    checkProp(Prop.forAll(word, word) { (a, b) =>
      Stns.levenshtein(a, b) == Stns.levenshtein(b, a) && Stns.levenshtein(a, a) == 0
    })
  }

  test("property: levenshtein bounded by max length, >= length difference") {
    val word = Gen.listOfN(10, Gen.oneOf('a', 'b', 'c')).map(_.mkString)
    checkProp(Prop.forAll(word, word) { (a, b) =>
      val d = Stns.levenshtein(a, b)
      d <= math.max(a.length, b.length) && d >= math.abs(a.length - b.length)
    })
  }

  test("levenshteinSim normalization") {
    assert(Stns.levenshteinSim("abc", "abc") == 1.0)
    assert(Stns.levenshteinSim("", "") == 1.0)
    assert(Stns.levenshteinSim("abcd", "abce") == 0.75)
  }

  test("similarity matrix contains exact-name matches at score 1") {
    val src = Array("kamoti velsu", "dorne hel", "warden north")
    val tgt = Array("warden north", "kamoti velsu", "unrelated zzz")
    val rows = Stns.similarity(spark, src, tgt, theta = 0.5).collectRows()
    assert(rows(0L).exists { case (t, s) => t == 1L && s == 1.0 })
    assert(rows(2L).exists { case (t, s) => t == 0L && s == 1.0 })
  }

  test("theta filters out dissimilar pairs") {
    val src = Array("aaaaaaaaaa")
    val tgt = Array("zzzzzzzzzz")
    val m = Stns.similarity(spark, src, tgt, theta = 0.5)
    assert(m.nnz == 0)
  }

  test("near-duplicates survive the LSH + theta pipeline") {
    val src = Array("bonjour tout le monde", "kamoti velsu dorne")
    val tgt = Array("bonjour tout le mond", "kamoti velsu dorn")
    val rows = Stns.similarity(spark, src, tgt, theta = 0.4).collectRows()
    assert(rows.contains(0L) && rows(0L).exists(_._1 == 0L))
    assert(rows.contains(1L) && rows(1L).exists(_._1 == 1L))
  }

  test("matrix scores equal direct levenshteinSim (oracle re-check)") {
    val src = Array("kamoti velsu", "dorne helan")
    val tgt = Array("kamoti velsue", "dorne helan")
    val rows = Stns.similarity(spark, src, tgt, theta = 0.3).collectRows()
    rows.foreach { case (s, cands) =>
      cands.foreach { case (t, score) =>
        assert(math.abs(score - Stns.levenshteinSim(src(s.toInt), tgt(t.toInt))) < 1e-12)
      }
    }
  }

  test("on the tiny dataset STNS finds most aligned pairs at theta=0.3") {
    val ds = repro.kg.KGGen.generate(spark, repro.exp.Datasets.tiny())
    val rows = Stns.similarity(
      spark, ds.source.namesArray, ds.target.namesArray, theta = 0.3).collectRows()
    val found = ds.truthPairs.count { case (s, t) =>
      rows.get(s).exists(_.exists(_._1 == t))
    }
    info(s"STNS candidate recall on tiny: ${found / 300.0}")
    assert(found > 150, s"too few aligned pairs survive LSH: $found/300")
  }
}
