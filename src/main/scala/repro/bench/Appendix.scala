package repro.bench

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions._
import repro.core.exec.{RddExecutor, Routes, SparkExecutor}
import repro.core.plan.{Optimizer, Unnester}
import repro.data.{BioData, NestedTpch}
import repro.queries.TpchQueries
import repro.shred.ShredTypes
import Harness._

/** App. D — succinct representation and sharing: tuple counts of the
  * flattened candidates (standard route: annotations duplicated per
  * occurrence) versus the candidates dictionary (shredded: one entry per
  * distinct mutation).
  */
object AppD {

  final case class Counts(occurrences: Long, flattenedCandidates: Long,
                          dictCandidates: Long) {
    def rows: Seq[Harness.Result] = Seq(
      Harness.Result("AppD", "occurrence tuples", "-", occurrences, 0, ok = true),
      Harness.Result("AppD", "flattened candidate tuples", "Standard", flattenedCandidates, 0, ok = true),
      Harness.Result("AppD", "dictionary candidate tuples", "Shred", dictCandidates, 0, ok = true))
  }

  def run(spark: SparkSession, sf: Double): Counts = {
    val bio = BioData.tables(spark, sf)
    val occ = bio.occurrences.persist(); occ.count()
    val dict = bio.occurrencesShredded(ShredTypes.dictName("Occurrences", Seq("candidates")))
    val occF = bio.occurrencesShredded(ShredTypes.topName("Occurrences"))
    val flattened = occ.select(explode(col("candidates"))).count()
    val used = dict.join(occF.select(col("candidates")).distinct(),
      dict(ShredTypes.LabelCol) === col("candidates")).count()
    val c = Counts(occ.count(), flattened, used)
    occ.unpersist()
    c
  }
}

/** App. E.4 — standard-route optimization levels: none / pushed projections /
  * full, on flat-to-nested and nested-to-nested queries.
  */
object E4 {

  def run(spark: SparkSession, sf: Double, levels: Seq[Int] = Seq(0, 1, 2),
          widths: Seq[Boolean] = Seq(false, true)): Seq[Result] = {
    val out = Seq.newBuilder[Result]
    val t0 = NestedTpch.tables(spark, sf)
    val t = t0.copy(lineitem = materialize(t0.lineitem), orders = materialize(t0.orders),
      customer = materialize(t0.customer), part = materialize(t0.part))
    val flatCat = Map("Lineitem" -> t.lineitem, "Orders" -> t.orders,
      "Customer" -> t.customer, "Nation" -> t.nation, "Region" -> t.region, "Part" -> t.part)

    for (wide <- widths; level <- levels) {
      val w = if (wide) "wide" else "narrow"
      for (opt <- 0 to 2) {
        val strat = Seq("Std(no opt)", "Std(proj)", "Std(full)")(opt)
        out += measure(spark, "E4", s"flat-to-nested L$level $w", strat) {
          force(Routes.standard(TpchQueries.flatToNested(level, wide), flatCat, Optimizer.level(opt)))
        }
      }
      if (level >= 1) {
        val nested = materialize(NestedTpch.nestedInput(t, level, wide = true))
        val shredded = NestedTpch.shreddedInput(t, level, wide = true).map {
          case (k, v) => k.replace(NestedTpch.inputName(level, wide = true),
            NestedTpch.inputName(level, wide)) -> v
        }
        val cat = flatCat + (NestedTpch.inputName(level, wide) -> nested) ++ shredded
        for (opt <- 0 to 2) {
          val strat = Seq("Std(no opt)", "Std(proj)", "Std(full)")(opt)
          out += measure(spark, "E4", s"nested-to-nested L$level $w", strat) {
            force(Routes.standard(TpchQueries.nestedToNested(level, wide), cat, Optimizer.level(opt)))
          }
        }
        nested.unpersist()
      }
    }
    Seq(t.lineitem, t.orders, t.customer, t.part).foreach(_.unpersist())
    out.result()
  }
}

/** App. E.1 — RDD vs Dataset executors on identical plans. */
object E1 {

  def run(spark: SparkSession, sf: Double, levels: Seq[Int] = Seq(0, 1, 2)): Seq[Result] = {
    val out = Seq.newBuilder[Result]
    val t0 = NestedTpch.tables(spark, sf)
    val t = t0.copy(lineitem = materialize(t0.lineitem), orders = materialize(t0.orders),
      customer = materialize(t0.customer), part = materialize(t0.part))
    val flatCat = Map("Lineitem" -> t.lineitem, "Orders" -> t.orders,
      "Customer" -> t.customer, "Nation" -> t.nation, "Region" -> t.region, "Part" -> t.part)

    for (level <- levels) {
      for ((family, mkQ) <- Seq(
        "flat-to-nested" -> ((l: Int) => TpchQueries.flatToNested(l, wide = false)),
        "nested-to-nested" -> ((l: Int) => TpchQueries.nestedToNested(l, wide = false)))) {
        val (cat, cleanup) =
          if (family == "flat-to-nested" || level == 0) (flatCat, () => ())
          else {
            val nested = materialize(NestedTpch.nestedInput(t, level, wide = false))
            (flatCat + (NestedTpch.inputName(level, wide = false) -> nested),
              () => { nested.unpersist(); () })
          }
        val plan = Optimizer.full(Unnester.compile(mkQ(level)))
        out += measure(spark, "E1", s"$family L$level narrow", "Dataset") {
          force(new SparkExecutor(cat).execute(plan))
        }
        // RDD conversion of cached inputs is untimed (both executors start
        // from cached inputs; the conversion is the Fig. 11 representation).
        val rddCat = cat.map { case (n, df) => n -> RddExecutor.fromDataFrame(df).cache() }
        rddCat.values.foreach(_.count())
        out += measure(spark, "E1", s"$family L$level narrow", "RDD") {
          new RddExecutor(rddCat).execute(plan).foreach(_ => ())
        }
        rddCat.values.foreach(_.unpersist())
        cleanup()
      }
    }
    Seq(t.lineitem, t.orders, t.customer, t.part).foreach(_.unpersist())
    out.result()
  }
}
