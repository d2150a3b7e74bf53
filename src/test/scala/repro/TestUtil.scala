package repro

import org.apache.spark.sql.DataFrame
import org.scalatest.Assertions._
import repro.core.{LocalEval, SparkValues}
import repro.core.NRC.Expr

/** Shared assertions for comparing Spark results against the LocalEval
  * reference interpreter, order-insensitively and recursively on nested bags.
  */
object TestUtil {

  def assertBagEq(actual: DataFrame, expected: LocalEval.Bag, hint: String = ""): Unit = {
    val got = LocalEval.canon(SparkValues.toBag(actual))
    val exp = LocalEval.canon(expected)
    assert(got == exp, s"$hint\n  spark: ${got.take(800)}\n  local: ${exp.take(800)}")
  }

  def assertBagEq(actual: DataFrame, expected: DataFrame): Unit = {
    val got = LocalEval.canon(SparkValues.toBag(actual))
    val exp = LocalEval.canon(SparkValues.toBag(expected))
    assert(got == exp, s"\n  left:  ${got.take(800)}\n  right: ${exp.take(800)}")
  }

  def localEval(q: Expr, inputs: Map[String, LocalEval.Bag]): LocalEval.Bag =
    LocalEval.evalBag(q, LocalEval.Env(Map.empty[String, Any], inputs))

  def toLocal(catalog: Map[String, DataFrame]): Map[String, LocalEval.Bag] =
    catalog.map { case (n, df) => n -> SparkValues.toBag(df) }
}
