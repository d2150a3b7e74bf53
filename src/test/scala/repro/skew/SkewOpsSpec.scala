package repro.skew

import repro.{SparkSpec, SynthData, TestData, TestUtil}
import repro.core.exec.SparkExecutor
import repro.core.plan.Unnester
import repro.data.NestedTpch
import repro.queries.TpchQueries

/** Skew-resilient processing tests: heavy-key detection on Zipf data and
  * result-equivalence of the skew-aware operators (Fig. 6).
  */
class SkewOpsSpec extends SparkSpec {

  private val cfg = SkewConfig(sampleFraction = 0.5)

  test("heavy keys found on Zipf-distributed data") {
    val df = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000, alpha = 1.3)
    val hk = SkewOps.heavyKeys(df, Seq("k"), cfg)
    assert(hk.nonEmpty, "expected heavy keys under Zipf")
    assert(hk.map(_.head).contains(1L), "rank-1 key must be heavy")
    assert(hk.size <= cfg.maxHeavyKeys)
  }

  test("no heavy keys on uniform data") {
    val df = SynthData.uniformKeys(spark, rows = 20000, nKeys = 1000)
    assert(SkewOps.heavyKeys(df, Seq("k"), cfg).isEmpty)
  }

  test("split partitions the bag exactly") {
    val df = SynthData.zipfKeys(spark, rows = 5000, nKeys = 100, alpha = 1.3)
    val t  = SkewOps.toTriple(df, Seq("k"), cfg)
    assert(t.light.count() + t.heavy.count() == df.count())
    assert(t.unioned.count() == df.count())
    // Heavy component contains only heavy keys, light none of them.
    val hkSet = t.heavyKeys.map(_.head).toSet
    assert(t.heavy.select("k").distinct().collect().forall(r => hkSet(r.get(0))))
    assert(t.light.select("k").distinct().collect().forall(r => !hkSet(r.get(0))))
  }

  test("skew-aware inner join equals the plain join on skewed data") {
    val l = SynthData.zipfKeys(spark, rows = 5000, nKeys = 100, alpha = 1.3)
    val r = SynthData.uniformKeys(spark, rows = 300, nKeys = 100, seed = 9)
      .withColumnRenamed("k", "k2").withColumnRenamed("v", "w")
    val plain = SparkExecutor.defaultJoin(l, r, Seq("k"), Seq("k2"), false)
    val skew  = SkewOps.skewJoin(cfg)(l, r, Seq("k"), Seq("k2"), false)
    TestUtil.assertBagEq(skew, plain)
  }

  test("skew-aware left-outer join equals the plain join (padding preserved)") {
    val l = SynthData.zipfKeys(spark, rows = 5000, nKeys = 200, alpha = 1.3)
    // Right side covers only half the key space → outer padding on the rest.
    val r = SynthData.uniformKeys(spark, rows = 200, nKeys = 100, seed = 5)
      .withColumnRenamed("k", "k2").withColumnRenamed("v", "w")
    val plain = SparkExecutor.defaultJoin(l, r, Seq("k"), Seq("k2"), true)
    val skew  = SkewOps.skewJoin(cfg)(l, r, Seq("k"), Seq("k2"), true)
    TestUtil.assertBagEq(skew, plain)
  }

  test("skew-aware join on uniform data degrades to the plain join") {
    val l = SynthData.uniformKeys(spark, rows = 2000, nKeys = 500)
    val r = SynthData.uniformKeys(spark, rows = 100, nKeys = 500, seed = 7)
      .withColumnRenamed("k", "k2").withColumnRenamed("v", "w")
    TestUtil.assertBagEq(
      SkewOps.skewJoin(cfg)(l, r, Seq("k"), Seq("k2"), false),
      SparkExecutor.defaultJoin(l, r, Seq("k"), Seq("k2"), false))
  }

  test("bagToDict keeps heavy labels unshuffled and all tuples present") {
    val df = SynthData.zipfKeys(spark, rows = 5000, nKeys = 50, alpha = 1.4)
      .withColumnRenamed("k", "label")
    val t = SkewOps.bagToDict(df, cfg = cfg)
    assert(t.unioned.count() == df.count())
    assert(t.heavyKeys.nonEmpty)
  }

  test("standard route with skew-aware joins preserves results end-to-end") {
    val t = TestData.tables(spark)
    val catalog = TestData.flatCatalog(t)
    val nested = NestedTpch.nestedInput(t, 2, wide = false)
    val cat = catalog + (NestedTpch.inputName(2, wide = false) -> nested)
    val q = TpchQueries.nestedToNested(2, wide = false)
    val plan = Unnester.compile(q)
    val base = new SparkExecutor(cat).execute(plan)
    val skew = new SparkExecutor(cat, SkewOps.skewJoin(SkewConfig(sampleFraction = 1.0)))
      .execute(plan)
    TestUtil.assertBagEq(skew, base)
  }

  test("shredded route with skew-aware joins preserves results end-to-end") {
    val t = TestData.tables(spark)
    val catalog = TestData.flatCatalog(t)
    val q = TpchQueries.nestedToFlat(2, wide = false)
    val sq = repro.shred.Shredder.shred("OUT", q)
    val shredded = NestedTpch.shreddedInput(t, 2, wide = false)
    val base = new repro.shred.ShredPipeline().run(sq, catalog ++ shredded)(sq.topAssignment.name)
    val skew = new repro.shred.ShredPipeline(
      joinImpl = SkewOps.skewJoin(SkewConfig(sampleFraction = 1.0)))
      .run(sq, catalog ++ shredded)(sq.topAssignment.name)
    TestUtil.assertBagEq(skew, base)
  }
}
