package repro.queries

import scala.collection.immutable.ListMap
import repro.core._
import repro.core.NRC._
import repro.data.NestedTpch
import repro.data.NestedTpch._

/** The NRC programs of the nested TPC-H micro-benchmark (App. B): the
  * flat-to-nested, nested-to-nested and nested-to-flat query families, each
  * parameterized by nesting level 0–4 and narrow/wide.
  */
object TpchQueries {

  private val dimVars = Seq("o", "c", "n", "r")

  private def input(name: String, elem: TupleTpe) = InputBag(name, BagTpe(elem))

  private def tupOf(x: VarDef, attrs: Seq[String], extra: (String, Expr)*): Tup =
    Tup(ListMap(attrs.map(a => a -> (Proj(VarRef(x), a): Expr)) ++ extra: _*))

  // --------------------------------------------------------- flat-to-nested

  /** B.1: iterative grouping of the flat tables; nested output. */
  def flatToNested(level: Int, wide: Boolean): Expr = {
    val l = VarDef("l", lineitemTpe)
    def bottom(parent: Option[(VarDef, String)]): Expr = {
      val body = Sng(tupOf(l, Seq("l_partkey", "l_quantity")))
      parent match {
        case None => ForUnion(l, input("Lineitem", lineitemTpe), body)
        case Some((p, selfKey)) =>
          ForUnion(l, input("Lineitem", lineitemTpe),
            IfThenBag(Cmp("==", Proj(VarRef(p), selfKey), Proj(VarRef(l), "l_orderkey")), body))
      }
    }
    if (level == 0) return bottom(None)

    def build(i: Int, parent: Option[(VarDef, String)]): Expr = {
      val lv = levels(wide)(i)
      val x  = VarDef(dimVars(i), lv.tpe(wide))
      val inner = if (i == 0) bottom(Some((x, lv.selfKey)))
                  else build(i - 1, Some((x, lv.selfKey)))
      val head = Sng(Tup(ListMap(
        outAttrs(lv, wide).map { case (a, _) => a -> (Proj(VarRef(x), a): Expr) } :+
          (BagNames(i) -> inner): _*)))
      parent match {
        case None => ForUnion(x, input(lv.table, lv.tpe(wide)), head)
        case Some((p, pKey)) =>
          ForUnion(x, input(lv.table, lv.tpe(wide)),
            IfThenBag(Cmp("==", Proj(VarRef(p), pKey), Proj(VarRef(x), lv.upKey.get)), head))
      }
    }
    build(level - 1, None)
  }

  // ------------------------------------------------------- nested-to-nested

  /** The lowest-level join + localized aggregate of Example 1:
    * `sumBy_pname^total (oparts ⋈ Part)`.
    */
  private def bottomAgg(src: Expr): Expr = {
    val l = VarDef("l2", src.asBag.elem)
    val p = VarDef("p", partTpe)
    SumByE(
      ForUnion(l, src,
        ForUnion(p, input("Part", partTpe),
          IfThenBag(Cmp("==", Proj(VarRef(l), "l_partkey"), Proj(VarRef(p), "p_partkey")),
            Sng(Tup(
              "p_name" -> Proj(VarRef(p), "p_name"),
              "total" -> Arith("*", Proj(VarRef(l), "l_quantity"), Proj(VarRef(p), "p_retailprice"))))))),
      Seq("p_name"), Seq("total"))
  }

  /** B.2: navigate the nested input, join Part at the lowest level, aggregate
    * with `sumBy`; same hierarchy as the input.
    */
  def nestedToNested(level: Int, wide: Boolean): Expr = {
    if (level == 0) return bottomAgg(input("Lineitem", lineitemTpe))
    val inName = inputName(level, wide)
    def build(i: Int, src: Expr): Expr = {
      // i is the dimension index of this level (top = level - 1).
      val lv = levels(wide)(i)
      val elem = nestedElem(i + 1, wide)
      val x = VarDef(dimVars(i), elem)
      val inner =
        if (i == 0) bottomAgg(Proj(VarRef(x), BagNames(0)))
        else build(i - 1, Proj(VarRef(x), BagNames(i)))
      ForUnion(x, src, Sng(Tup(ListMap(
        outAttrs(lv, wide).map { case (a, _) => a -> (Proj(VarRef(x), a): Expr) } :+
          (BagNames(i) -> inner): _*))))
    }
    build(level - 1, input(inName, nestedElem(level, wide)))
  }

  // ---------------------------------------------------------- nested-to-flat

  /** Grouping attributes of the top level (narrow: the display attribute,
    * wide: every scalar attribute).
    */
  def topKeys(level: Int, wide: Boolean): Seq[String] =
    if (level == 0) Seq("p_name")
    else outAttrs(levels(wide)(level - 1), wide).map(_._1)

  /** B.3: full navigation with the Part join, aggregated at the top level;
    * flat output keeping only outermost attributes.
    */
  def nestedToFlat(level: Int, wide: Boolean): Expr = {
    if (level == 0) return bottomAgg(input("Lineitem", lineitemTpe))
    val inName = inputName(level, wide)
    val topElem = nestedElem(level, wide)
    val topVar = VarDef(dimVars(level - 1), topElem)
    val keys = topKeys(level, wide)

    // Chain of generators from the top variable down to lineitem elements.
    def chain(i: Int, parent: VarDef, inner: VarDef => Expr): Expr =
      if (i == 0) {
        val x = VarDef("l2", NestedTpch.bottomElem)
        ForUnion(x, Proj(VarRef(parent), BagNames(0)), inner(x))
      } else {
        val x = VarDef(dimVars(i - 1), nestedElem(i, wide))
        ForUnion(x, Proj(VarRef(parent), BagNames(i)), chain(i - 1, x, inner))
      }

    val p = VarDef("p", partTpe)
    val body = chain(level - 1, topVar, { l =>
      ForUnion(p, input("Part", partTpe),
        IfThenBag(Cmp("==", Proj(VarRef(l), "l_partkey"), Proj(VarRef(p), "p_partkey")),
          Sng(Tup(ListMap(
            keys.map(a => a -> (Proj(VarRef(topVar), a): Expr)) :+
              ("total" -> (Arith("*", Proj(VarRef(l), "l_quantity"),
                Proj(VarRef(p), "p_retailprice")): Expr)): _*)))))
    })
    SumByE(ForUnion(topVar, input(inName, topElem), body), keys, Seq("total"))
  }
}
