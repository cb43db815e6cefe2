package repro

import org.apache.spark.sql.functions._

class SynthDataSpec extends SparkSpec {

  private val sf = 0.001

  test("lineitem scales with sf and is deterministic") {
    val a = SynthData.lineitem(spark, sf)
    assert(a.count() == 6000L)
    val s1 = a.agg(sum("l_extendedprice")).head().getDouble(0)
    val s2 = SynthData.lineitem(spark, sf).agg(sum("l_extendedprice")).head().getDouble(0)
    assert(s1 == s2)
  }

  test("orders keys are dense 1..N") {
    val o = SynthData.orders(spark, sf)
    val r = o.agg(min("o_orderkey"), max("o_orderkey"), count(lit(1))).head()
    assert(r.getLong(0) == 1L && r.getLong(1) == r.getLong(2))
  }

  test("lineitem orderkeys reference the orders domain") {
    val nOrders = SynthData.orders(spark, sf).count()
    val bad = SynthData.lineitem(spark, sf)
      .where(col("l_orderkey") < 1 || col("l_orderkey") > nOrders + 1).count()
    assert(bad == 0)
  }

  test("customer segments come from the fixed domain") {
    val segs = SynthData.customer(spark, sf).select("c_mktsegment").distinct()
      .collect().map(_.getString(0)).toSet
    assert(segs.subsetOf(Set("BUILDING", "AUTOMOBILE", "MACHINERY", "HOUSEHOLD", "FURNITURE")))
  }

  test("part sizes are within 1..51") {
    val r = SynthData.part(spark, sf).agg(min("p_size"), max("p_size")).head()
    assert(r.getInt(0) >= 1 && r.getInt(1) <= 51)
  }

  test("zipf keys are skewed: the top key dominates a uniform draw") {
    val z = SynthData.zipfKeys(spark, 20000, 1000)
    val u = SynthData.uniformKeys(spark, 20000, 1000)
    def topShare(df: org.apache.spark.sql.DataFrame): Double =
      df.groupBy("k").count().agg(max("count")).head().getLong(0).toDouble / 20000
    assert(topShare(z) > 3 * topShare(u))
  }

  test("uniform keys stay within the requested domain") {
    val r = SynthData.uniformKeys(spark, 5000, 100).agg(min("k"), max("k")).head()
    assert(r.getLong(0) >= 1 && r.getLong(1) <= 101)
  }
}
