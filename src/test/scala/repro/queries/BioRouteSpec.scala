package repro.queries

import repro.{SparkSpec, TestUtil}
import repro.core.exec.Routes
import repro.data.BioData

/** Correctness of the biomedical pipeline and clinical queries across the
  * standard route, the shredded route and the LocalEval reference.
  */
class BioRouteSpec extends SparkSpec {

  private lazy val t = BioData.tables(spark, sf = 0.003)
  private lazy val catalog = BioData.catalog(t)
  private lazy val local = TestUtil.toLocal(
    catalog.view.filterKeys(k => !k.contains("__")).toMap)

  test("bio generators are deterministic and non-empty") {
    assert(t.samples.count() > 0 && t.occurrences.count() > 0)
    assert(t.network.count() > 0 && t.soImpact.count() == 20)
    val again = BioData.tables(spark, sf = 0.003)
    TestUtil.assertBagEq(again.occurrences, t.occurrences)
  }

  test("shredded Occurrences components unshred to the nested Occurrences") {
    import repro.shred.Unshredder
    val renamed = t.occurrencesShredded.map { case (k, v) => k.replace("Occurrences", "RT") -> v }
    val back = Unshredder.unshred("RT", BioData.occurrencesTpe, renamed)
    TestUtil.assertBagEq(back, t.occurrences)
  }

  test("candidate dictionary is shared across occurrences (App. D premise)") {
    import repro.shred.ShredTypes
    val dict = t.occurrencesShredded(ShredTypes.dictName("Occurrences", Seq("candidates")))
    val occF = t.occurrencesShredded(ShredTypes.topName("Occurrences"))
    val used = dict.join(occF.select(occF("candidates")).distinct(),
      dict(ShredTypes.LabelCol) === occF("candidates")).count()
    val flattened = t.occurrences.selectExpr("explode(candidates)").count()
    // Each referenced dictionary entry appears once; flattening repeats it
    // per occurrence, so the dictionary never exceeds the flattened tuples.
    assert(used <= flattened)
  }

  for ((name, q) <- Seq("Step1" -> BioQueries.step1) ++ BioQueries.clinical.toSeq) {
    test(s"$name: standard route matches LocalEval") {
      TestUtil.assertBagEq(Routes.standard(q, catalog), TestUtil.localEval(q, local), name)
    }
    test(s"$name: shredded route matches the standard route") {
      val (sq, out) = Routes.shred("OUT", q, catalog)
      val nested = repro.shred.Unshredder.unshred("OUT", sq.outTpe, out)
      TestUtil.assertBagEq(nested, Routes.standard(q, catalog))
    }
  }

  test("E2E pipeline: standard route matches LocalEval step by step") {
    val localOut = repro.core.LocalEval.evalProgram(BioQueries.e2e,
      repro.core.LocalEval.Env(Map.empty[String, Any], local))
    val sparkOut = Routes.standardProgram(BioQueries.e2e, catalog)
    for (step <- Seq("HybridMatrix", "SampleNetwork", "EffectMatrix", "ConnectMatrix", "Connectivity"))
      TestUtil.assertBagEq(sparkOut(step), localOut(step), step)
  }

  test("E2E pipeline: shredded route matches the standard route end-to-end") {
    val std = Routes.standardProgram(BioQueries.e2e, catalog)
    val cat = Routes.shredProgram(BioQueries.e2e, catalog)
    // Final output is flat: Connectivity__F is the whole result.
    TestUtil.assertBagEq(cat("Connectivity__F"), std("Connectivity"))
    // An intermediate nested output reassembles identically.
    val hm = Routes.unshredOutput(BioQueries.e2e, "HybridMatrix", cat)
    TestUtil.assertBagEq(hm, std("HybridMatrix"))
  }
}
