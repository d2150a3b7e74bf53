package repro.core.plan

import org.scalatest.funsuite.AnyFunSuite
import repro.queries.TpchQueries

/** Structural tests of the unnesting algorithm (no Spark): operator shapes
  * per query family, mirroring the plans of App. B.
  */
class UnnesterPlanSpec extends AnyFunSuite {

  private def count(p: Plan)(f: PartialFunction[Plan, Boolean]): Int =
    (if (f.isDefinedAt(p) && f(p)) 1 else 0) + p.children.map(count(_)(f)).sum

  private def joins(p: Plan)      = count(p) { case _: Join => true }
  private def outerJoins(p: Plan) = count(p) { case j: Join => j.leftOuter }
  private def unnests(p: Plan)    = count(p) { case _: Unnest => true }
  private def outerUnnests(p: Plan) = count(p) { case u: Unnest => u.outer }
  private def nests(p: Plan)      = count(p) { case _: NestBag => true }
  private def sums(p: Plan)       = count(p) { case _: NestSum => true }
  private def indexes(p: Plan)    = count(p) { case _: AddIndex => true }

  test("flat-to-nested level 0 is a bare projection") {
    val p = Unnester.compile(TpchQueries.flatToNested(0, wide = false))
    assert(joins(p) == 0 && nests(p) == 0 && unnests(p) == 0)
  }

  test("flat-to-nested level 2: outer joins with one Γ⊎ and unique ID per level") {
    val p = Unnester.compile(TpchQueries.flatToNested(2, wide = false))
    assert(joins(p) == 2 && outerJoins(p) == 2, p.pretty())
    assert(nests(p) == 2 && indexes(p) == 2, p.pretty())
    assert(sums(p) == 0)
  }

  test("flat-to-nested level 4 scales the same shape") {
    val p = Unnester.compile(TpchQueries.flatToNested(4, wide = false))
    assert(joins(p) == 4 && nests(p) == 4 && indexes(p) == 4)
  }

  test("nested-to-nested level 2: outer unnests, Part outer join, Γ⁺ then Γ⊎ (Fig. 3 shape)") {
    val p = Unnester.compile(TpchQueries.nestedToNested(2, wide = false))
    assert(unnests(p) == 2 && outerUnnests(p) == 2, p.pretty())
    assert(joins(p) == 1 && outerJoins(p) == 1)
    assert(sums(p) == 1 && nests(p) == 2)
  }

  test("nested-to-flat level 2: plain unnests, inner Part join, single top Γ⁺") {
    val p = Unnester.compile(TpchQueries.nestedToFlat(2, wide = false))
    assert(unnests(p) == 2 && outerUnnests(p) == 0, p.pretty())
    assert(joins(p) == 1 && outerJoins(p) == 0)
    assert(sums(p) == 1 && nests(p) == 0 && indexes(p) == 0)
  }

  test("nested-to-flat level 0 is join + aggregate") {
    val p = Unnester.compile(TpchQueries.nestedToFlat(0, wide = false))
    assert(joins(p) == 1 && sums(p) == 1 && unnests(p) == 0)
  }

  test("duplicate bound variable names are rejected") {
    import repro.core._
    import repro.core.NRC._
    val liT = TupleTpe("a" -> IntTpe)
    val x = VarDef("x", liT)
    val q = ForUnion(x, InputBag("L", BagTpe(liT)),
      ForUnion(x, InputBag("L", BagTpe(liT)), Sng(Tup("a" -> Proj(VarRef(x), "a")))))
    assertThrows[Unnester.CompileError](Unnester.compile(q))
  }

  test("more than one constructed bag attribute per level is rejected") {
    import repro.core._
    import repro.core.NRC._
    val liT = TupleTpe("a" -> IntTpe)
    val x = VarDef("x", liT); val y = VarDef("y", liT); val z = VarDef("z", liT)
    val sub1 = ForUnion(y, InputBag("L", BagTpe(liT)),
      IfThenBag(Cmp("==", Proj(VarRef(x), "a"), Proj(VarRef(y), "a")), Sng(Tup("a" -> Proj(VarRef(y), "a")))))
    val sub2 = ForUnion(z, InputBag("L", BagTpe(liT)),
      IfThenBag(Cmp("==", Proj(VarRef(x), "a"), Proj(VarRef(z), "a")), Sng(Tup("a" -> Proj(VarRef(z), "a")))))
    val q = ForUnion(x, InputBag("L", BagTpe(liT)),
      Sng(Tup("a" -> Proj(VarRef(x), "a"), "b1" -> sub1, "b2" -> sub2)))
    assertThrows[Unnester.CompileError](Unnester.compile(q))
  }

  test("plan pretty-printer renders every operator") {
    val p = Unnester.compile(TpchQueries.nestedToNested(2, wide = false))
    val s = p.pretty()
    assert(s.contains("Γ+") && s.contains("Γ⊎") && s.contains("outer-μ") && s.contains("⟕"))
  }

  test("plan size is consistent with children") {
    val p = Unnester.compile(TpchQueries.nestedToNested(3, wide = true))
    assert(p.size == 1 + p.children.map(_.size).sum)
    assert(p.size > 10)
  }

  test("bag-attribute passthrough compiles without recursion") {
    import repro.core._
    import repro.core.NRC._
    val inner = BagTpe.of("v" -> IntTpe)
    val elemT = TupleTpe("k" -> IntTpe, "b" -> inner)
    val x = VarDef("pt", elemT)
    val q = ForUnion(x, InputBag("N", BagTpe(elemT)),
      Sng(Tup("k" -> Proj(VarRef(x), "k"), "b" -> Proj(VarRef(x), "b"))))
    val p = Unnester.compile(q)
    assert(nests(p) == 0 && unnests(p) == 0)
  }
}
