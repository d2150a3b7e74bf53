package repro.core.plan

import repro.{SparkSpec, TestData, TestUtil}
import repro.core.exec.SparkExecutor
import repro.data.NestedTpch
import repro.queries.TpchQueries

/** Optimizer correctness: every optimization level produces the same result,
  * and the rewrites change plan shape as intended (E.4 setup).
  */
class OptimizerSpec extends SparkSpec {

  private lazy val t       = TestData.tables(spark)
  private lazy val catalog = TestData.flatCatalog(t)

  private def countNestSum(p: Plan): Int =
    (p match { case _: NestSum => 1; case _ => 0 }) + p.children.map(countNestSum).sum

  private def hasSumBelowJoin(p: Plan): Boolean = p match {
    case Join(l, r, _, _, _) => countNestSum(l) + countNestSum(r) > 0 ||
      hasSumBelowJoin(l) || hasSumBelowJoin(r)
    case _ => p.children.exists(hasSumBelowJoin)
  }

  test("aggregation pushing introduces a partial sum below the Part join") {
    val plan = Unnester.compile(TpchQueries.nestedToFlat(2, wide = false))
    assert(!hasSumBelowJoin(plan))
    val opt = Optimizer.pushAggregation(plan)
    assert(hasSumBelowJoin(opt))
    assert(countNestSum(opt) > countNestSum(plan))
  }

  test("projection pushing trims project widths") {
    def maxProj(p: Plan): Int = (p match {
      case Project(_, cols) => cols.size
      case _ => 0
    }).max(p.children.map(maxProj).maxOption.getOrElse(0))
    val plan = Unnester.compile(TpchQueries.nestedToFlat(2, wide = true))
    assert(maxProj(Optimizer.pushProjections(plan)) <= maxProj(plan))
  }

  for (level <- Seq(0, 1, 2); family <- Seq("n2f", "n2n")) {
    test(s"optimization level $level preserves results for $family level-2 narrow") {
      val q = family match {
        case "n2f" => TpchQueries.nestedToFlat(2, wide = false)
        case "n2n" => TpchQueries.nestedToNested(2, wide = false)
      }
      val nested = NestedTpch.nestedInput(t, 2, wide = false)
      val cat = catalog + (NestedTpch.inputName(2, wide = false) -> nested)
      val base = new SparkExecutor(cat).execute(Unnester.compile(q))
      val opt  = new SparkExecutor(cat).execute(Optimizer.level(level)(Unnester.compile(q)))
      TestUtil.assertBagEq(opt, base)
    }
  }

  test("aggregation pushing preserves results on the flat join-aggregate") {
    val q = TpchQueries.nestedToFlat(0, wide = false)
    val base = new SparkExecutor(catalog).execute(Unnester.compile(q))
    val opt  = new SparkExecutor(catalog).execute(Optimizer.full(Unnester.compile(q)))
    TestUtil.assertBagEq(opt, base)
  }

  test("aggregation pushing down a two-join chain preserves results") {
    val q = TpchQueries.nestedToFlat(4, wide = false)
    val nested = NestedTpch.nestedInput(t, 4, wide = false)
    val cat = catalog + (NestedTpch.inputName(4, wide = false) -> nested)
    val plan = Unnester.compile(q)
    val opt  = Optimizer.full(plan)
    TestUtil.assertBagEq(new SparkExecutor(cat).execute(opt),
      new SparkExecutor(cat).execute(plan))
  }

  test("optimizer levels preserve nested-to-nested wide results") {
    val q = TpchQueries.nestedToNested(1, wide = true)
    val nested = NestedTpch.nestedInput(t, 1, wide = true)
    val cat = catalog + (NestedTpch.inputName(1, wide = true) -> nested)
    val base = new SparkExecutor(cat).execute(Unnester.compile(q))
    for (lvl <- 0 to 2) {
      val opt = new SparkExecutor(cat).execute(Optimizer.level(lvl)(Unnester.compile(q)))
      TestUtil.assertBagEq(opt, base)
    }
  }
}
