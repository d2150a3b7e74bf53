package repro.shred

import repro.{SparkSpec, TestData, TestUtil}
import repro.core.SparkValues
import repro.core.plan.Unnester
import repro.core.exec.SparkExecutor
import repro.data.NestedTpch
import repro.queries.TpchQueries

/** End-to-end tests of the shredded compilation route (§4): shred →
  * materialize → execute each flat assignment → unshred, validated against
  * the LocalEval reference and the standard route.
  */
class ShredRouteSpec extends SparkSpec {

  private lazy val t       = TestData.tables(spark)
  private lazy val catalog = TestData.flatCatalog(t)
  private lazy val local   = TestUtil.toLocal(catalog)
  private lazy val pipe    = new ShredPipeline()

  private def standard(q: repro.core.NRC.Expr, cat: Map[String, org.apache.spark.sql.DataFrame]) =
    new SparkExecutor(cat).execute(Unnester.compile(q))

  // ------------------------------------------------------- flat-to-nested

  for (level <- 1 to 4; wide <- Seq(false, true)) {
    val tag = s"level $level ${if (wide) "wide" else "narrow"}"
    test(s"flat-to-nested $tag: shred+unshred matches LocalEval") {
      val q  = TpchQueries.flatToNested(level, wide)
      val sq = Shredder.shred("OUT", q)
      val df = pipe.runNested(sq, catalog)
      TestUtil.assertBagEq(df, TestUtil.localEval(q, local), tag)
    }
  }

  // ------------------------------------------------------ nested-to-nested

  for (level <- 1 to 4; wide <- Seq(false, true)) {
    val tag = s"level $level ${if (wide) "wide" else "narrow"}"
    test(s"nested-to-nested $tag: shred+unshred matches the standard route") {
      val q = TpchQueries.nestedToNested(level, wide)
      val name = NestedTpch.inputName(level, wide)
      val nested = NestedTpch.nestedInput(t, level, wide)
      val shredded = NestedTpch.shreddedInput(t, level, wide)
      val df = pipe.runNested(Shredder.shred("OUT", q), catalog ++ shredded)
      TestUtil.assertBagEq(df, standard(q, catalog + (name -> nested)))
    }
  }

  test("nested-to-nested level 2 narrow: shredded components match LocalEval per level") {
    val q = TpchQueries.nestedToNested(2, wide = false)
    val sq = Shredder.shred("OUT", q)
    val out = pipe.run(sq, catalog ++ NestedTpch.shreddedInput(t, 2, wide = false))
    // Lowest dictionary: localized join+aggregate over (label, p_name).
    val loc = TestUtil.localEval(sq.program("OUT__D_corders_oparts").expr,
      TestUtil.toLocal(catalog ++ NestedTpch.shreddedInput(t, 2, wide = false)))
    TestUtil.assertBagEq(out("OUT__D_corders_oparts"), loc)
  }

  // -------------------------------------------------------- nested-to-flat

  for (level <- 1 to 4; wide <- Seq(false, true)) {
    val tag = s"level $level ${if (wide) "wide" else "narrow"}"
    test(s"nested-to-flat $tag: shredded route matches the standard route") {
      val q = TpchQueries.nestedToFlat(level, wide)
      val name = NestedTpch.inputName(level, wide)
      val nested = NestedTpch.nestedInput(t, level, wide)
      val shredded = NestedTpch.shreddedInput(t, level, wide)
      val sq = Shredder.shred("OUT", q)
      val out = pipe.run(sq, catalog ++ shredded)(sq.topAssignment.name)
      TestUtil.assertBagEq(out, standard(q, catalog + (name -> nested)))
    }
  }

  // ------------------------------------------------- value shred/unshred

  for (level <- 1 to 3) {
    test(s"value shredding round-trip at level $level") {
      val nested = NestedTpch.nestedInput(t, level, wide = false)
      val tpe = repro.core.BagTpe(NestedTpch.nestedElem(level, wide = false))
      val parts = ValueShredding.shredValue("RT", tpe, nested)
      val back = Unshredder.unshred("RT", tpe, parts)
      TestUtil.assertBagEq(back, nested)
    }
  }

  test("B.1.3 natural-key shredded input unshreds to the nested input") {
    val tpe = repro.core.BagTpe(NestedTpch.nestedElem(2, wide = false))
    val parts = NestedTpch.shreddedInput(t, 2, wide = false)
    val renamed = parts.map { case (k, v) => k.replace("COP2n", "RT") -> v }
    val back = Unshredder.unshred("RT", tpe, renamed)
    TestUtil.assertBagEq(back, NestedTpch.nestedInput(t, 2, wide = false))
  }

  test("shredded output of flat-to-nested matches the B.1.3 shredded input") {
    // Shredding the flat-to-nested query should reproduce (up to label
    // values) the natural-key shredded input; here labels coincide because
    // domain elimination picks the same natural keys.
    val sq = Shredder.shred("OUT", TpchQueries.flatToNested(2, wide = false))
    val out = pipe.run(sq, catalog)
    val expect = NestedTpch.shreddedInput(t, 2, wide = false)
    TestUtil.assertBagEq(out("OUT__F"), expect("COP2n__F"))
    TestUtil.assertBagEq(out("OUT__D_corders"), expect("COP2n__D_corders"))
    TestUtil.assertBagEq(out("OUT__D_corders_oparts"), expect("COP2n__D_corders_oparts"))
  }

  test("baseline label-domain materialization computes correctly") {
    import repro.core._
    import repro.core.NRC._
    val xT = TupleTpe("k" -> IntTpe)
    val yT = TupleTpe("v" -> IntTpe)
    val x = VarDef("x", xT); val y = VarDef("y", yT)
    val q = ForUnion(x, InputBag("X", BagTpe(xT)),
      Sng(Tup("k" -> Proj(VarRef(x), "k"),
        "b" -> ForUnion(y, InputBag("Y", BagTpe(yT)),
          Sng(Tup("s" -> Arith("+", Proj(VarRef(y), "v"), Proj(VarRef(x), "k"))))))))
    import spark.implicits._
    val cat = Map(
      "X" -> Seq(1L, 2L, 2L).toDF("k"),
      "Y" -> Seq(10L, 20L).toDF("v"))
    val sq = Shredder.shred("OUT", q)
    val df = pipe.runNested(sq, cat)
    TestUtil.assertBagEq(df, TestUtil.localEval(q, TestUtil.toLocal(cat)))
  }
}
