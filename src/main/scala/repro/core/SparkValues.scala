package repro.core

import org.apache.spark.sql.{DataFrame, Row}

/** Converts collected Spark results into [[LocalEval]] values so nested
  * outputs can be compared order-insensitively against the reference
  * interpreter (the DuckDB oracle only handles flat rows).
  */
object SparkValues {

  def toBag(df: DataFrame): LocalEval.Bag = df.collect().toSeq.map(rowToTuple)

  def rowToTuple(r: Row): LocalEval.Tuple =
    r.schema.fields.zipWithIndex.map { case (f, i) => f.name -> conv(r.get(i)) }.toMap

  private def conv(v: Any): Any = v match {
    case r: Row => rowToTuple(r)
    // Spark hands arrays back as mutable.ArraySeq; normalize to immutable.
    case s: scala.collection.Seq[_] => s.toSeq.map(conv)
    case bd: java.math.BigDecimal   => bd.doubleValue
    case other => other
  }
}
