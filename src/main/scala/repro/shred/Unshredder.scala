package repro.shred

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.core._
import repro.shred.ShredTypes._

/** Value unshredding (§4): reassembles a nested DataFrame from a shredded
  * relation's top bag and dictionaries.
  *
  * The reconstruction is bottom-up: a dictionary's own nested attributes are
  * reassembled first, then its tuples are grouped by label into
  * `(label, array<struct>)` and joined into the parent through a left-outer
  * join (labels with no entry become the empty bag) — the join+nest cogroup
  * pattern of §3.3.
  */
object Unshredder {

  /** @param name relation/query name used in the `__F`/`__D_` convention
    * @param tpe  the original nested bag type
    * @param dfs  catalog containing the shredded components
    */
  def unshred(name: String, tpe: BagTpe, dfs: Map[String, DataFrame]): DataFrame = {
    def component(n: String): DataFrame =
      dfs.getOrElse(n, sys.error(s"unshred: missing shredded component $n"))

    /** Reassemble nested attributes of the bag at `path` inside its carrier
      * DataFrame (`label` column untouched).
      */
    def rebuild(df: DataFrame, elem: TupleTpe, path: Seq[String]): DataFrame =
      elem.fields.foldLeft(df) {
        case (acc, (a, BagTpe(inner))) =>
          val childPath = path :+ a
          val child = rebuild(component(dictName(name, childPath)), inner, childPath)
          val fieldCols = inner.fields.keys.toSeq
          val grouped = child
            .groupBy(col(LabelCol).as("__ulbl"))
            .agg(collect_list(struct(fieldCols.map(col): _*)).as("__ubag"))
          val bagType = grouped.schema("__ubag").dataType
          acc.join(grouped, acc(a) === grouped("__ulbl"), "left_outer")
            .withColumn(a, coalesce(col("__ubag"), array().cast(bagType)))
            .drop("__ulbl", "__ubag")
        case (acc, _) => acc
      }

    val top = rebuild(component(topName(name)), tpe.elem, Seq.empty)
    top.select(tpe.elem.fields.keys.toSeq.map(col): _*)
  }
}
