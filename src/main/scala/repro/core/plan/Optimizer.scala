package repro.core.plan

import repro.core.RealTpe

/** Plan-level optimizations (§3.3, App. E.4):
  *
  *  - **Projection pushing** (column pruning): required columns are computed
  *    top-down and every `Project` is trimmed to them, so wide tuples shed
  *    unused attributes before shuffles.
  *  - **Aggregation pushing** (eager aggregation): a Γ⁺ over a join whose
  *    summed expression factors into `l_expr * r_expr` (sides disjoint) is
  *    rewritten to pre-aggregate the left side grouped by its join keys and
  *    retained grouping attributes — the partial-sums-before-the-Part-join
  *    rewrite of Example 2 — applied recursively down join chains.
  *
  * The join-then-nest → cogroup fusion of §3.3 needs no plan rewrite here:
  * the unnester keys each Γ on a prefix of the join keys, so Catalyst reuses
  * the join's hash partitioning for the grouping (one shuffle, as a cogroup).
  *
  * `Optimizer.level` mirrors the E.4 experiment: 0 = none, 1 = pushed
  * projections, 2 = full (projections + aggregation pushing).
  */
object Optimizer {

  val none: Plan => Plan = identity

  val pushProjections: Plan => Plan = p => prune(p, None)

  val pushAggregation: Plan => Plan = p => pushAgg(p)

  val full: Plan => Plan = p => prune(pushAgg(p), None)

  def level(n: Int): Plan => Plan = n match {
    case 0 => none
    case 1 => pushProjections
    case 2 => full
    case _ => sys.error(s"unknown optimization level $n")
  }

  // --------------------------------------------------- projection pushing

  /** Trim every `Project` to the columns required above it. `needed = None`
    * at the root keeps the full output.
    */
  private def prune(p: Plan, needed: Option[Set[String]]): Plan = p match {
    case Project(c, cols) =>
      val kept = needed match {
        case None    => cols
        case Some(n) => cols.filter { case (name, _) => n(name) }
      }
      Project(prune(c, Some(kept.flatMap(_._2.cols).toSet)), kept)

    case Select(c, cond) =>
      Select(prune(c, needed.map(_ ++ cond.cols)), cond)

    case Join(l, r, lk, rk, o) =>
      // Column names are globally unique, so both sides prune with the same
      // set; each keeps only what it actually produces.
      val n2 = needed.map(_ ++ lk ++ rk)
      Join(prune(l, n2), prune(r, n2), lk, rk, o)

    case Unnest(c, bagCol, fields, prefix, o, pres) =>
      val produced = fields.map(f => s"${prefix}__$f").toSet ++ pres
      Unnest(prune(c, needed.map(_ -- produced + bagCol)), bagCol, fields, prefix, o, pres)

    case AddIndex(c, col) =>
      AddIndex(prune(c, needed.map(_ - col)), col)

    case NestBag(c, g, sc, out, pres) =>
      val below = g.toSet ++ sc.map(_._2) ++ pres.toSeq.flatMap(_.cols)
      NestBag(prune(c, Some(below)), g, sc, out, pres)

    case NestSum(c, g, sums) =>
      val below = g.toSet ++ sums.flatMap(_._2.cols)
      NestSum(prune(c, Some(below)), g, sums)

    case DedupP(c)   => DedupP(prune(c, needed))
    case UnionP(l, r) => UnionP(prune(l, needed), prune(r, needed))
    case s: Source   => s
  }

  // --------------------------------------------------- aggregation pushing

  /** Output columns of a plan (Sources are always wrapped in a Project by
    * the unnester, so the traversal is complete).
    */
  def colsOf(p: Plan): Set[String] = p match {
    case _: Source            => Set.empty
    case Project(_, cols)     => cols.map(_._1).toSet
    case Select(c, _)         => colsOf(c)
    case Join(l, r, _, _, _)  => colsOf(l) ++ colsOf(r)
    case Unnest(c, bagCol, fields, prefix, _, pres) =>
      colsOf(c) - bagCol ++ fields.map(f => s"${prefix}__$f") ++ pres
    case AddIndex(c, col)     => colsOf(c) + col
    case NestBag(_, g, _, out, _) => g.toSet + out
    case NestSum(_, g, sums)  => g.toSet ++ sums.map(_._1)
    case DedupP(c)            => colsOf(c)
    case UnionP(l, _)         => colsOf(l)
  }

  private var ctr = 0
  private def fresh(): String = { ctr += 1; s"__pa_$ctr" }

  private def pushAgg(p: Plan): Plan = p match {
    case ns @ NestSum(child, group, Seq((out, v))) =>
      val (base, mapping) = resolveThroughProjects(child)
      base match {
        case Join(l, r, lk, rk, joinOuter) =>
          val groupInner = group.map(g => mapping.getOrElse(g, ColRef(g)))
          val vInner     = substVal(v, mapping)
          if (!groupInner.forall(_.isInstanceOf[ColRef]))
            return mapChildrenPlan(ns, pushAgg)
          val gInner = groupInner.map { case ColRef(n) => n; case _ => sys.error("unreachable") }
          def restore(inner: Plan): Plan =
            Project(inner, group.zip(gInner).map { case (g, n) => g -> (ColRef(n): ValExpr) } :+
              (out -> (ColRef(out): ValExpr)))
          val (lc, rc) = (colsOf(l), colsOf(r))
          if (vInner.cols.nonEmpty && vInner.cols.subsetOf(rc) && !joinOuter) {
            // The summed expression lives entirely on the right side:
            // pre-aggregate it below the join — this is what localizes the
            // aggregation onto the lowest dictionary in shredded
            // nested-to-flat chains (§4.6).
            val rGroup = (gInner.filter(rc) ++ rk).distinct
            val tmp    = fresh()
            val rAgg   = pushAgg(NestSum(r, rGroup, Seq(tmp -> vInner)))
            restore(NestSum(Join(l, rAgg, lk, rk, joinOuter), gInner, Seq(out -> ColRef(tmp))))
          } else factor(vInner, lc, rc) match {
            case Some((lExpr, rExpr)) =>
              val lGroup = (gInner.filter(lc) ++ lk).distinct
              val tmp    = fresh()
              // Pre-aggregate the left side, then recurse: the partial sum
              // may push further down a join chain.
              val lAgg = pushAgg(NestSum(l, lGroup, Seq(tmp -> lExpr)))
              restore(NestSum(Join(lAgg, r, lk, rk, joinOuter), gInner,
                Seq(out -> ArithV("*", ColRef(tmp), rExpr))))
            case None => mapChildrenPlan(ns, pushAgg)
          }
        case _ => mapChildrenPlan(ns, pushAgg)
      }
    case other => mapChildrenPlan(other, pushAgg)
  }

  /** Peel `Project` layers, composing their column definitions. */
  private def resolveThroughProjects(p: Plan): (Plan, Map[String, ValExpr]) = p match {
    case Project(c, cols) =>
      val (base, inner) = resolveThroughProjects(c)
      (base, cols.map { case (n, v) => n -> substVal(v, inner) }.toMap)
    case other => (other, Map.empty)
  }

  private def substVal(v: ValExpr, m: Map[String, ValExpr]): ValExpr = v match {
    case ColRef(n)        => m.getOrElse(n, v)
    case ArithV(op, a, b) => ArithV(op, substVal(a, m), substVal(b, m))
    case CmpV(op, a, b)   => CmpV(op, substVal(a, m), substVal(b, m))
    case AndV(a, b)       => AndV(substVal(a, m), substVal(b, m))
    case OrV(a, b)        => OrV(substVal(a, m), substVal(b, m))
    case NotV(a)          => NotV(substVal(a, m))
    case IfV(c, t, e)     => IfV(substVal(c, m), substVal(t, m), substVal(e, m))
    case LabelV(as)       => LabelV(as.map(substVal(_, m)))
    case IsNotNullV(a)    => IsNotNullV(substVal(a, m))
    case WhenV(c, a)      => WhenV(substVal(c, m), substVal(a, m))
    case _: LitV          => v
  }

  /** Split `v` into `lExpr * rExpr` with column sets on opposite join sides;
    * an expression entirely on one side pairs with the literal 1.
    */
  private def factor(v: ValExpr, lCols: Set[String], rCols: Set[String]): Option[(ValExpr, ValExpr)] =
    v match {
      case _ if v.cols.nonEmpty && v.cols.subsetOf(lCols) => Some((v, LitV(1.0, RealTpe)))
      case ArithV("*", a, b) if a.cols.subsetOf(lCols) && a.cols.nonEmpty &&
                                b.cols.subsetOf(rCols) && b.cols.nonEmpty => Some((a, b))
      case ArithV("*", a, b) if b.cols.subsetOf(lCols) && b.cols.nonEmpty &&
                                a.cols.subsetOf(rCols) && a.cols.nonEmpty => Some((b, a))
      case _ => None
    }

  private def mapChildrenPlan(p: Plan, f: Plan => Plan): Plan = p match {
    case s: Source            => s
    case Select(c, cond)      => Select(f(c), cond)
    case Project(c, cols)     => Project(f(c), cols)
    case Join(l, r, lk, rk, o) => Join(f(l), f(r), lk, rk, o)
    case Unnest(c, b, fs, pr, o, pc) => Unnest(f(c), b, fs, pr, o, pc)
    case AddIndex(c, col)     => AddIndex(f(c), col)
    case NestBag(c, g, sc, out, pres) => NestBag(f(c), g, sc, out, pres)
    case NestSum(c, g, sums)  => NestSum(f(c), g, sums)
    case DedupP(c)            => DedupP(f(c))
    case UnionP(l, r)         => UnionP(f(l), f(r))
  }
}
