package repro.data

import repro.{SparkSpec, TestData}
import repro.core._
import repro.shred.ShredTypes

/** Benchmark-input construction: nested element types, nested DataFrames and
  * shredded components agree with each other and with the naming convention.
  */
class NestedTpchSpec extends SparkSpec {

  private lazy val t = TestData.tables(spark)

  test("nestedElem narrow level 2 has the expected shape") {
    val e = NestedTpch.nestedElem(2, wide = false)
    assert(e.fields.keys.toSeq == Seq("c_name", "corders"))
    val corders = e("corders").asInstanceOf[BagTpe].elem
    assert(corders.fields.keys.toSeq == Seq("o_orderdate", "oparts"))
    assert(corders("oparts").asInstanceOf[BagTpe].elem.fields.keys.toSeq ==
      Seq("l_partkey", "l_quantity"))
  }

  test("nestedElem wide level 1 keeps all order attributes") {
    val e = NestedTpch.nestedElem(1, wide = true)
    assert(e.fields.keys.toSeq ==
      Seq("o_orderkey", "o_custkey", "o_orderstatus", "o_totalprice", "o_orderdate", "oparts"))
  }

  test("nested input DataFrame schema matches the NRC type at every level") {
    for (level <- 1 to 4; wide <- Seq(false, true)) {
      val df = NestedTpch.nestedInput(t, level, wide)
      val elem = NestedTpch.nestedElem(level, wide)
      assert(df.columns.toSeq == elem.fields.keys.toSeq, s"level=$level wide=$wide")
    }
  }

  test("nested input top-level cardinalities follow the dimension tables") {
    assert(NestedTpch.nestedInput(t, 1, wide = false).count() == t.orders.count())
    assert(NestedTpch.nestedInput(t, 2, wide = false).count() == t.customer.count())
    assert(NestedTpch.nestedInput(t, 3, wide = false).count() == 25)
    assert(NestedTpch.nestedInput(t, 4, wide = false).count() == 5)
  }

  test("shredded input has one component per nesting level plus the top bag") {
    for (level <- 1 to 4) {
      val parts = NestedTpch.shreddedInput(t, level, wide = false)
      assert(parts.size == level + 1, s"level=$level: ${parts.keys}")
      val name = NestedTpch.inputName(level, wide = false)
      val elem = NestedTpch.nestedElem(level, wide = false)
      val expected = ShredTypes.components(name, BagTpe(elem)).map(_._1).toSet
      assert(parts.keySet == expected)
    }
  }

  test("shredded component columns match the dictionary element types") {
    val name = NestedTpch.inputName(2, wide = false)
    val elem = NestedTpch.nestedElem(2, wide = false)
    val parts = NestedTpch.shreddedInput(t, 2, wide = false)
    for ((n, tpe) <- ShredTypes.components(name, BagTpe(elem)))
      assert(parts(n).columns.toSeq == tpe.fields.keys.toSeq, n)
  }

  test("lineitem dictionary rows equal the lineitem table") {
    val parts = NestedTpch.shreddedInput(t, 3, wide = false)
    val dict = parts(ShredTypes.dictName(NestedTpch.inputName(3, wide = false),
      Seq("ncusts", "corders", "oparts")))
    assert(dict.count() == t.lineitem.count())
  }
}
