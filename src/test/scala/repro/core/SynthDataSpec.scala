package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, SynthData}

/** Tests for the provided TPC-H-lite generators (kept healthy even though
  * LargeEA's benchmarks come from repro.kg.KGGen — jobs may mix both).
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem is deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, 0.001, 1).agg(sum("l_quantity")).collect()(0).getDouble(0)
    val b = SynthData.lineitem(spark, 0.001, 1).agg(sum("l_quantity")).collect()(0).getDouble(0)
    assert(a == b)
  }

  test("row counts scale with sf") {
    assert(SynthData.orders(spark, 0.001).count() == 1500)
    assert(SynthData.customer(spark, 0.001).count() == 150)
    assert(SynthData.part(spark, 0.001).count() == 200)
  }

  test("orders keys are dense 1..n") {
    val o = SynthData.orders(spark, 0.001)
    val mm = o.agg(min("o_orderkey"), max("o_orderkey")).collect()(0)
    assert(mm.getLong(0) == 1L && mm.getLong(1) == 1500L)
  }

  test("lineitem-orders join cardinality via DuckDB oracle") {
    val li = SynthData.lineitem(spark, 0.0005, 7).select("l_orderkey", "l_quantity")
    val o = SynthData.orders(spark, 0.0005, 8).select("o_orderkey", "o_orderstatus")
    val got = li.join(o, li("l_orderkey") === o("o_orderkey"))
      .groupBy("o_orderstatus").agg(count(lit(1)).as("n"))
      .select(col("o_orderstatus"), col("n").cast("string").as("n"))
    Oracle.assertEquivalent(
      got,
      """SELECT o_orderstatus, CAST(COUNT(*) AS VARCHAR) AS n
        |FROM li JOIN o ON CAST(li.l_orderkey AS BIGINT) = CAST(o.o_orderkey AS BIGINT)
        |GROUP BY o_orderstatus""".stripMargin,
      "li" -> li, "o" -> o)
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000)
    val u = SynthData.uniformKeys(spark, 20000, 1000)
    def topShare(df: org.apache.spark.sql.DataFrame): Double = {
      val top = df.groupBy("k").count().orderBy(col("count").desc).limit(10)
        .agg(sum("count")).collect()(0).getLong(0)
      top.toDouble / 20000
    }
    assert(topShare(z) > 3 * topShare(u), s"zipf=${topShare(z)} uniform=${topShare(u)}")
  }

  test("discounts and taxes stay in range") {
    val li = SynthData.lineitem(spark, 0.0005)
    val bad = li.where(col("l_discount") < 0 || col("l_discount") > 0.1 ||
                       col("l_tax") < 0 || col("l_tax") > 0.08).count()
    assert(bad == 0)
  }
}
