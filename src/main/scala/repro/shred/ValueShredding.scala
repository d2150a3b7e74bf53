package repro.shred

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.core._
import repro.shred.ShredTypes._

/** Value shredding (§4): converts a nested DataFrame into its shredded
  * components — the flat top bag plus one flat dictionary per nested level —
  * assigning a fresh label to every inner bag.
  *
  * Benchmark inputs are instead shredded with *natural keys* as labels (the
  * B.1.3 projections built by `repro.data.NestedTpch`), which additionally
  * exhibits sharing; this generic routine supports arbitrary nested values
  * and is used for round-trip testing and ad-hoc inputs.
  */
object ValueShredding {

  /** Shred `df : tpe` into `{name__F, name__D_<path> …}`. */
  def shredValue(name: String, tpe: BagTpe, df: DataFrame): Map[String, DataFrame] = {
    val out = scala.collection.mutable.Map.empty[String, DataFrame]

    def walk(cur: DataFrame, elem: TupleTpe, path: Seq[String], outName: String): Unit = {
      val bagAs = elem.bagAttrs
      // monotonically_increasing_id is only stable within one evaluation;
      // persist so the parent projection and every child explosion see the
      // same label assignment (the paper's pipelines cache inputs anyway).
      var d = if (bagAs.nonEmpty)
        cur.withColumn("__rowid", monotonically_increasing_id()).persist()
      else cur
      for (a <- bagAs) {
        val inner = elem(a) match { case BagTpe(t) => t; case _ => sys.error("unreachable") }
        val child = d
          .select(col("__rowid").as(LabelCol), explode(col(a)).as("__el"))
          .select(col(LabelCol) +: inner.fields.keys.toSeq.map(f => col("__el")(f).as(f)): _*)
        walk(child, inner, path :+ a, dictName(name, path :+ a))
        d = d.withColumn(a, col("__rowid"))
      }
      val keep =
        (if (path.nonEmpty) Seq(col(LabelCol)) else Seq.empty) ++
          elem.fields.keys.toSeq.map(col)
      out(outName) = d.select(keep: _*)
    }

    walk(df, tpe.elem, Seq.empty, topName(name))
    out.toMap
  }
}
