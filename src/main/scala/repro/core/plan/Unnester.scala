package repro.core.plan

import scala.collection.immutable.ListMap
import repro.core._
import repro.core.NRC._

/** Unnesting (§3.1): translates a comprehension-shaped NRC expression into a
  * plan of the algebraic operators, following Fegaras–Maier [26].
  *
  * The translation is level-wise. At the root it emits inner joins and plain
  * unnests; upon entering a nested bag expression it attaches a unique ID to
  * the current plan, switches to outer joins / outer unnests (so outer tuples
  * with empty inner bags survive), tracks the grouping-attribute set 𝒢, and
  * closes the level with a Γ⊎ (or Γ⁺ for `sumBy`) keyed on 𝒢.
  *
  * Column discipline: every comprehension variable `x` of tuple type is
  * flattened into columns `x__f`; presence markers (`…__present`) record
  * whether a row carries a real inner tuple or outer-padding NULLs.
  *
  * Supported fragment (documented in DESIGN.md): chains of `for`/`if` with
  * equality join conditions, heads with at most one bag-valued attribute per
  * level, `sumBy`/`groupBy`/`dedup` wrappers and scalar expressions. The full
  * language is interpreted by [[repro.core.LocalEval]].
  */
object Unnester {

  final case class CompileError(msg: String) extends RuntimeException(msg)

  /** Compile a bag-typed NRC expression to a plan whose output columns are
    * exactly the attribute names of the expression's element type (bag-valued
    * attributes as `array<struct>` columns).
    */
  def compile(e0: Expr): Plan = {
    val e  = inlineLets(e0)
    checkUniqueVars(e)
    val st = new State
    val res = compileBag(e, None, st)
    Project(res.plan, res.head.map { case (out, c) => out -> ColRef(c) })
  }

  // ------------------------------------------------------------ internals

  private class State {
    private var n = 0
    def fresh(p: String): String = { n += 1; s"__${p}_$n" }
  }

  /** The flat plan being built for the current level. */
  private final case class Ctx(
      plan: Plan,
      cols: Vector[String],
      env: Map[String, TupleTpe],
      presence: Vector[ValExpr])

  /** Result of compiling one (sub-)bag: the plan, its columns, the mapping
    * from output attribute names to plan columns, and the presence predicate
    * a parent Γ⊎ must apply.
    */
  private final case class Res(
      plan: Plan,
      cols: Vector[String],
      head: Seq[(String, String)],
      presence: Option[ValExpr])

  /** Context a nested level inherits: the parent plan (with unique ID and
    * materialized head attributes) and the grouping-attribute set 𝒢.
    */
  private final case class OuterCtx(ctx: Ctx, group: Vector[String])

  private def compileBag(e: Expr, outer: Option[OuterCtx], st: State): Res = e match {
    case SumByE(inner, keys, values) =>
      val (ctx, head) = compileComp(inner, outer, st)
      val headMap = head.toMap
      // Rows marked absent by outer operators or presence-conjunct filters
      // must not contribute: mask keys and values to NULL on such rows (the
      // Γ⁺ NULL-casting of §2.2); the null-key group is dropped by the
      // parent Γ⊎'s presence predicate.
      val presAll = if (ctx.presence.nonEmpty) Some(ValExpr.all(ctx.presence)) else None
      def mask(v: ValExpr): ValExpr = presAll.map(p => WhenV(p, v): ValExpr).getOrElse(v)
      def headVal(a: String): ValExpr = mask(toVal(headMap.getOrElse(a,
        throw CompileError(s"sumBy attr $a not in head")), ctx.env))
      val keyCols = keys.map(k => k -> st.fresh("k"))
      val withKeys =
        if (keyCols.isEmpty) ctx.plan
        else Project(ctx.plan,
          ctx.cols.map(c => c -> (ColRef(c): ValExpr)) ++
            keyCols.map { case (k, c) => c -> headVal(k) })
      val group  = outer.map(_.group).getOrElse(Vector.empty) ++ keyCols.map(_._2)
      val sums   = values.map(v => st.fresh("s") -> headVal(v))
      val plan   = NestSum(withKeys, group, sums)
      val headOut = keys.zip(keyCols.map(_._2)) ++ values.zip(sums.map(_._1))
      val pres = outer.flatMap(_ => keyCols.headOption.map(kc => IsNotNullV(ColRef(kc._2))))
      Res(plan, group.toVector ++ sums.map(_._1), headOut, pres)

    case GroupByE(inner, keys, groupAs) =>
      val (ctx, head) = compileComp(inner, outer, st)
      val headMap = head.toMap
      val elemAttrs = head.map(_._1)
      val rest = elemAttrs.filterNot(keys.contains)
      val presAllG = if (ctx.presence.nonEmpty) Some(ValExpr.all(ctx.presence)) else None
      def headVal(a: String): ValExpr = {
        val v = toVal(headMap(a), ctx.env)
        // Mask keys of absent rows so they cannot found spurious groups.
        if (keys.contains(a)) presAllG.map(p => WhenV(p, v): ValExpr).getOrElse(v) else v
      }
      val keyCols  = keys.map(k => k -> st.fresh("k"))
      val restCols = rest.map(a => a -> st.fresh("g"))
      val presCol  = st.fresh("pres")
      val presExpr = ValExpr.all(ctx.presence)
      val projected = Project(ctx.plan,
        ctx.cols.map(c => c -> (ColRef(c): ValExpr)) ++
          keyCols.map { case (k, c) => c -> headVal(k) } ++
          restCols.map { case (a, c) => c -> headVal(a) } :+
          (presCol -> presExpr))
      val group = outer.map(_.group).getOrElse(Vector.empty) ++ keyCols.map(_._2)
      val outCol = st.fresh("b")
      val plan = NestBag(projected, group, restCols.map { case (a, c) => a -> c }, outCol,
        if (ctx.presence.nonEmpty) Some(ColRef(presCol)) else None)
      val headOut = keys.zip(keyCols.map(_._2)) :+ (groupAs -> outCol)
      val pres = outer.flatMap(_ => keyCols.headOption.map(kc => IsNotNullV(ColRef(kc._2))))
      Res(plan, group.toVector :+ outCol, headOut, pres)

    case DedupE(inner) =>
      if (outer.isDefined) throw CompileError("dedup supported at the root only")
      val r = compileBag(inner, None, st)
      val projected = Project(r.plan, r.head.map { case (out, c) => out -> (ColRef(c): ValExpr) })
      Res(DedupP(projected), r.head.map(_._1).toVector, r.head.map { case (o, _) => o -> o }, None)

    case BagUnion(l, r) =>
      if (outer.isDefined) throw CompileError("⊎ supported at the root only")
      val rl = compileBag(l, None, st)
      val rr = compileBag(r, None, st)
      val pl = Project(rl.plan, rl.head.map { case (o, c) => o -> (ColRef(c): ValExpr) })
      val pr = Project(rr.plan, rr.head.map { case (o, c) => o -> (ColRef(c): ValExpr) })
      Res(UnionP(pl, pr), rl.head.map(_._1).toVector, rl.head.map { case (o, _) => o -> o }, None)

    case InputBag(name, BagTpe(elem)) if outer.isEmpty =>
      val cols = elem.fields.keys.toVector
      Res(Project(Source(name), cols.map(c => c -> (ColRef(c): ValExpr))),
          cols, cols.map(c => c -> c), None)

    case _ =>
      val (ctx, head) = compileComp(e, outer, st)
      finishLevel(ctx, head, outer, st)
  }

  /** Close a level: materialize scalar head attributes, recurse into the (at
    * most one) bag-valued head attribute, and nest it back with Γ⊎.
    */
  private def finishLevel(ctx: Ctx, head: Seq[(String, Expr)],
                          outer: Option[OuterCtx], st: State): Res = {
    val (bagFieldsAll, scalarFields) = head.partition(_._2.tpe.isInstanceOf[BagTpe])
    // Bag attributes that are plain projections of an in-scope variable pass
    // through as existing array columns; only constructed bags recurse.
    val (passthrough, bagFields) = bagFieldsAll.partition {
      case (_, Proj(VarRef(_, _), _)) => true
      case _                          => false
    }
    if (bagFields.size > 1)
      throw CompileError(s"more than one constructed bag attribute per level: ${bagFields.map(_._1)}")

    val scalarCols = scalarFields.map { case (n, ex) => (n, st.fresh("h"), toVal(ex, ctx.env)) }
    val passCols = passthrough.map { case (n, ex) =>
      val Proj(VarRef(v, _), a) = ex: @unchecked
      (n, s"${v}__$a")
    }
    val presCol  = if (outer.isDefined) Some(st.fresh("pres")) else None
    val presProj = presCol.toSeq.map(c => c -> ValExpr.all(ctx.presence))

    bagFields.headOption match {
      case None =>
        val group = outer.map(_.group).getOrElse(Vector.empty)
        val proj = Project(ctx.plan,
          group.map(c => c -> (ColRef(c): ValExpr)) ++
            scalarCols.map { case (_, c, v) => c -> v } ++
            passCols.map { case (_, c) => c -> (ColRef(c): ValExpr) } ++
            presProj)
        val cols = group ++ scalarCols.map(_._2) ++ passCols.map(_._2) ++ presCol
        val headOut = head.map {
          case (n, _) if scalarCols.exists(_._1 == n) => n -> scalarCols.find(_._1 == n).get._2
          case (n, _)                                 => n -> passCols.find(_._1 == n).get._2
        }
        Res(proj, cols, headOut, presCol.map(c => ColRef(c)))

      case Some((bName, bExpr)) =>
        val idCol = st.fresh("id")
        val keepAll = Project(ctx.plan,
          ctx.cols.map(c => c -> (ColRef(c): ValExpr)) ++
            scalarCols.map { case (_, c, v) => c -> v } ++ presProj)
        val indexed = AddIndex(keepAll, idCol)
        val newCols = ctx.cols ++ scalarCols.map(_._2) ++ presCol :+ idCol
        val childGroup = outer.map(_.group).getOrElse(Vector.empty) ++
          presCol.toVector ++ Vector(idCol) ++ scalarCols.map(_._2) ++ passCols.map(_._2)
        val childCtx = Ctx(indexed, newCols, ctx.env, Vector.empty)
        val childRes = compileBag(bExpr, Some(OuterCtx(childCtx, childGroup)), st)
        val outCol = st.fresh("b")
        val nested = NestBag(childRes.plan, childGroup,
          childRes.head, outCol, childRes.presence)
        val cols = childGroup :+ outCol
        val headOut = head.map {
          case (n, _) if n == bName                   => n -> outCol
          case (n, _) if scalarCols.exists(_._1 == n) => n -> scalarCols.find(_._1 == n).get._2
          case (n, _)                                 => n -> passCols.find(_._1 == n).get._2
        }
        Res(nested, cols, headOut, presCol.map(c => ColRef(c)))
    }
  }

  /** Translate the generator/condition prefix of a comprehension, returning
    * the flat plan and the head tuple's attribute expressions.
    */
  private def compileComp(e: Expr, outer: Option[OuterCtx],
                          st: State): (Ctx, Seq[(String, Expr)]) = {
    val (gens, conds0, headTup) = destructure(e, Vector.empty, Vector.empty)
    val nested = outer.isDefined
    var ctx = outer.map(_.ctx).getOrElse(Ctx(null, Vector.empty, Map.empty, Vector.empty))
    var pool = conds0

    for ((x, src) <- gens) {
      src match {
        case InputBag(name, BagTpe(elem)) =>
          val fieldCols = elem.fields.keys.toSeq.map(f => s"${x.name}__$f" -> (ColRef(f): ValExpr))
          val marker = s"${x.name}__present"
          var right: Plan = Project(Source(name),
            if (nested) fieldCols :+ (marker -> (LitV(true, BoolTpe): ValExpr)) else fieldCols)
          if (ctx.plan == null) {
            ctx = ctx.copy(plan = right, cols = fieldCols.map(_._1).toVector,
              env = ctx.env + (x.name -> elem))
          } else {
            val envAfter = ctx.env + (x.name -> elem)
            // Split the pool: join keys, right-side-only filters, leftovers.
            val (joinable, rest0) = pool.partition(c => isEquiJoin(c, x.name, ctx.env))
            val (rightOnly, rest) = rest0.partition(c =>
              freeVars(c).subsetOf(Set(x.name)) && freeVars(c).nonEmpty)
            // With no equi conditions this degenerates to a correlated cross
            // product: a left-outer join on TRUE (empty key lists) keeps
            // every outer tuple even when the right side is empty.
            rightOnly.foreach { c =>
              right = Select(right, toVal(c, Map(x.name -> elem)))
            }
            pool = rest
            val (lkeys, rkeys) = joinable.map { c =>
              val Cmp("==", a, b) = c: @unchecked
              if (freeVars(a).subsetOf(Set(x.name))) (b, a) else (a, b)
            }.map { case (le, re) =>
              (toVal(le, ctx.env), toVal(re, Map(x.name -> elem)))
            }.unzip
            val (lp, lcols, lnames) = ensureCols(ctx.plan, ctx.cols, lkeys, st)
            val (rp, rcols, rnames) = ensureCols(right, fieldCols.map(_._1).toVector ++
              (if (nested) Vector(marker) else Vector.empty), rkeys, st)
            val joined = Join(lp, rp, lnames, rnames, leftOuter = nested)
            val pres = if (nested) ctx.presence :+ IsNotNullV(ColRef(marker)) else ctx.presence
            ctx = Ctx(joined, lcols ++ rcols, envAfter, pres)
          }

        case p @ Proj(VarRef(v, _), a) if p.tpe.isInstanceOf[BagTpe] =>
          if (ctx.plan == null) throw CompileError(s"path generator $v.$a with no outer plan")
          val elem = p.tpe.asInstanceOf[BagTpe].elem
          val arrayCol = s"${v}__$a"
          val presCol  = if (nested) Some(s"${x.name}__present") else None
          val plan = Unnest(ctx.plan, arrayCol, elem.fields.keys.toSeq, x.name, nested, presCol)
          val cols = ctx.cols.filterNot(_ == arrayCol) ++
            elem.fields.keys.map(f => s"${x.name}__$f") ++ presCol
          // The unnest presence column is already boolean (false on the
          // padding row of an empty bag) — unlike join markers, no
          // IsNotNull wrapping.
          val pres = presCol.map(c => ctx.presence :+ (ColRef(c): ValExpr)).getOrElse(ctx.presence)
          ctx = Ctx(plan, cols, ctx.env + (x.name -> elem), pres)

        case other =>
          throw CompileError(s"unsupported generator source: $other")
      }
      // Consume any fully-bound conditions that are not join conditions.
      val (ready, later) = pool.partition(c => freeVars(c).subsetOf(ctx.env.keySet))
      ready.foreach { c =>
        if (nested) ctx = ctx.copy(presence = ctx.presence :+ toVal(c, ctx.env))
        else ctx = ctx.copy(plan = Select(ctx.plan, toVal(c, ctx.env)))
      }
      pool = later
    }
    if (pool.nonEmpty)
      throw CompileError(s"unconsumed conditions referencing unbound vars: $pool")
    (ctx, headTup.fields.toSeq)
  }

  /** Strip `for`/`if` prefixes down to the singleton head. */
  private def destructure(e: Expr, gens: Vector[(VarDef, Expr)],
                          conds: Vector[Expr]): (Vector[(VarDef, Expr)], Vector[Expr], Tup) =
    e match {
      case ForUnion(x, src, body) => destructure(body, gens :+ (x -> src), conds)
      case IfThenBag(c, body)     => destructure(body, gens, conds ++ conjuncts(c))
      case Sng(t: Tup)            => (gens, conds, t)
      case Sng(v @ VarRef(_, t: TupleTpe)) =>
        (gens, conds, Tup(ListMap(t.fields.keys.map(f => f -> (Proj(v, f): Expr)).toSeq: _*)))
      case other => throw CompileError(s"unsupported comprehension body: $other")
    }

  private def conjuncts(e: Expr): Vector[Expr] = e match {
    case And(l, r) => conjuncts(l) ++ conjuncts(r)
    case other     => Vector(other)
  }

  /** Is `c` an equality linking the new variable `x` with already-bound vars? */
  private def isEquiJoin(c: Expr, x: String, env: Map[String, TupleTpe]): Boolean = c match {
    case Cmp("==", a, b) =>
      val (fa, fb) = (freeVars(a), freeVars(b))
      (fa.subsetOf(Set(x)) && fa.nonEmpty && fb.nonEmpty && fb.subsetOf(env.keySet)) ||
      (fb.subsetOf(Set(x)) && fb.nonEmpty && fa.nonEmpty && fa.subsetOf(env.keySet))
    case _ => false
  }

  /** Ensure each key expression is available as a named column, adding a
    * computing projection if necessary.
    */
  private def ensureCols(plan: Plan, cols: Vector[String], keys: Seq[ValExpr],
                         st: State): (Plan, Vector[String], Seq[String]) = {
    if (keys.forall(_.isInstanceOf[ColRef]))
      (plan, cols, keys.map { case ColRef(n) => n; case _ => sys.error("unreachable") })
    else {
      val named = keys.map {
        case ColRef(n) => (n, None)
        case other     => (st.fresh("jk"), Some(other))
      }
      val proj = Project(plan,
        cols.map(c => c -> (ColRef(c): ValExpr)) ++
          named.collect { case (n, Some(v)) => n -> v })
      (proj, cols ++ named.collect { case (n, Some(_)) => n }, named.map(_._1))
    }
  }

  /** Translate a scalar NRC expression over comprehension variables into a
    * column expression.
    */
  def toVal(e: Expr, env: Map[String, TupleTpe]): ValExpr = e match {
    case Proj(VarRef(v, _), f) =>
      require(env.contains(v), s"variable $v not in scope")
      ColRef(s"${v}__$f")
    case Const(v, t)       => LitV(v, t)
    case Arith(op, l, r)   => ArithV(op, toVal(l, env), toVal(r, env))
    case Cmp(op, l, r)     => CmpV(op, toVal(l, env), toVal(r, env))
    case And(l, r)         => AndV(toVal(l, env), toVal(r, env))
    case Or(l, r)          => OrV(toVal(l, env), toVal(r, env))
    case Not(x)            => NotV(toVal(x, env))
    case ScalarIf(c, t, f) => IfV(toVal(c, env), toVal(t, env), toVal(f, env))
    case NewLabelE(args)   => LabelV(args.map(toVal(_, env)))
    case other             => throw CompileError(s"unsupported scalar expression: $other")
  }

  private def checkUniqueVars(e: Expr): Unit = {
    val seen = scala.collection.mutable.Set.empty[String]
    def walk(x: Expr): Unit = {
      x match {
        case ForUnion(v, _, _) =>
          if (!seen.add(v.name))
            throw CompileError(s"bound variable '${v.name}' reused; use unique names per query")
        case Let(v, _, _) => seen.add(v.name); ()
        case _ => ()
      }
      children(x).foreach(walk)
    }
    walk(e)
  }
}
