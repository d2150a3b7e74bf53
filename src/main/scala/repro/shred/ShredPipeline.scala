package repro.shred

import org.apache.spark.sql.DataFrame
import repro.core.NRC._
import repro.core.plan.{Plan, Unnester}
import repro.core.exec.SparkExecutor

/** Runs a shredded query: compiles each flat assignment through the standard
  * unnesting + Spark execution and threads outputs into the catalog, so the
  * dictionary for a level can read its parent (sequential strategy).
  *
  * @param optimize plan-to-plan rewriting applied to every assignment
  * @param joinImpl join execution strategy (plain or skew-aware)
  */
final class ShredPipeline(
    optimize: Plan => Plan = identity,
    joinImpl: SparkExecutor.JoinImpl = SparkExecutor.defaultJoin) {

  /** Execute all assignments; returns the catalog extended with each
    * assignment's output DataFrame (shredded components of the result).
    */
  def run(sq: Shredder.ShreddedQuery, catalog: Map[String, DataFrame]): Map[String, DataFrame] = {
    var cat = catalog
    for (a <- sq.assignments) {
      val plan = optimize(Unnester.compile(a.expr))
      val df   = new SparkExecutor(cat, joinImpl).execute(plan)
      cat = cat + (a.name -> df)
    }
    cat
  }

  /** Execute and reassemble the nested result (Shred + Unshred). */
  def runNested(sq: Shredder.ShreddedQuery, catalog: Map[String, DataFrame]): DataFrame =
    Unshredder.unshred(sq.name, sq.outTpe, run(sq, catalog))

  /** Compiled plans per assignment (for plan-shape tests and inspection). */
  def plans(sq: Shredder.ShreddedQuery): Seq[(String, Plan)] =
    sq.assignments.map(a => a.name -> optimize(Unnester.compile(a.expr)))
}
