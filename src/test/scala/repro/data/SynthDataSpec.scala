package repro.data

import repro.{SparkSpec, SynthData}
import org.apache.spark.sql.functions._

/** Generator sanity: schemas, determinism, fixed dimensions, skew shape. */
class SynthDataSpec extends SparkSpec {

  test("nation has 25 rows with region keys 0-4") {
    val n = SynthData.nation(spark)
    assert(n.count() == 25)
    assert(n.select("n_regionkey").distinct().count() == 5)
    assert(n.columns.toSeq == Seq("n_nationkey", "n_name", "n_regionkey"))
  }

  test("region has 5 rows") {
    assert(SynthData.region(spark).count() == 5)
  }

  test("lineitem is deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, 0.002).agg(sum("l_orderkey")).collect()(0).get(0)
    val b = SynthData.lineitem(spark, 0.002).agg(sum("l_orderkey")).collect()(0).get(0)
    assert(a == b)
  }

  test("lineitemSkewed at factor 0 equals the uniform generator") {
    val a = SynthData.lineitem(spark, 0.002)
    val b = SynthData.lineitemSkewed(spark, 0.002, 0)
    assert(a.collect().toSeq == b.collect().toSeq)
  }

  test("lineitemSkewed concentrates keys as the skew factor grows") {
    def topShare(skew: Int): Double = {
      val df = SynthData.lineitemSkewed(spark, 0.01, skew)
      val total = df.count().toDouble
      val top = df.groupBy("l_partkey").count().orderBy(col("count").desc)
        .limit(5).agg(sum("count")).collect()(0).getLong(0).toDouble
      top / total
    }
    val s0 = topShare(0); val s2 = topShare(2); val s4 = topShare(4)
    assert(s0 < s2 && s2 < s4, s"expected increasing concentration: $s0 $s2 $s4")
    assert(s4 > 0.3, s"high skew should concentrate mass, got $s4")
  }

  test("orders reference custkeys within range") {
    val o = SynthData.orders(spark, 0.002)
    val maxCust = o.agg(max("o_custkey")).collect()(0).getLong(0)
    val nCust = SynthData.customer(spark, 0.002).count()
    assert(maxCust <= nCust + 1)
  }

  test("tpch tables scale with sf") {
    assert(SynthData.lineitem(spark, 0.002).count() < SynthData.lineitem(spark, 0.004).count())
  }
}
