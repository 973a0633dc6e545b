package repro.frontend

import repro.core.{Catalog, TondIR}
import repro.core.TondIR._
import repro.tensor.Einsum
import Dsl._

/** DSL → TondIR translation (§III-C/§III-D, Table V).
  *
  * The operator DAG is walked bottom-up; every node becomes one rule (the
  * ANF property: one operation per binding), with globally fresh variable
  * and relation names (relation-access renaming, §III-B). Structurally
  * identical sub-DAGs are memoized to a single rule chain, mirroring how
  * ANF names shared subexpressions once.
  */
object Lower {

  /** Result of lowering one node: its relation name and — for arrays — the
    * tensor shape. */
  private final case class Val(rel: String, schema: Vector[String], order: Int = -1, nCols: Int = -1)

  def lower(root: Df, cat: Catalog): Program = lower(root.op, cat)

  def lower(root: POp, cat: Catalog): Program = {
    val ng = new NameGen("v")
    val rules = scala.collection.mutable.ArrayBuffer[Rule]()
    val memo = scala.collection.mutable.HashMap[POp, Val]()

    def freshVars(schema: Vector[String]): Vector[String] = schema.map(c => ng.fresh(c))

    def exprTerm(e: PExpr, varOf: Map[String, String]): Term = e match {
      case PCol(n) => TVar(varOf.getOrElse(n, sys.error(s"lower: unknown column '$n' (have ${varOf.keys.toVector.sorted})")))
      case PLit(i: Int)  => TConst(i.toLong)
      case PLit(v)       => TConst(v)
      case PBin(op, l, r) => TBin(op, exprTerm(l, varOf), exprTerm(r, varOf))
      case PIf(c, t, el)  => TIf(exprTerm(c, varOf), exprTerm(t, varOf), exprTerm(el, varOf))
      case PLike(x, p, neg) => TBin(if (neg) "notlike" else "like", exprTerm(x, varOf), TConst(p))
      case PIn(x, vals)  => TBin("in", exprTerm(x, varOf),
                                 TExt("list", vals.map { case i: Int => TConst(i.toLong); case v => TConst(v) }))
      case PFun(fn, args) => TExt(fn, args.map(exprTerm(_, varOf)))
    }

    def conjuncts(e: PExpr): Vector[PExpr] = e match {
      case PBin("and", l, r) => conjuncts(l) ++ conjuncts(r)
      case other             => Vector(other)
    }

    /** Emit one rule deriving `cols` (name → term) from the given body. */
    def emit(cols: Vector[(String, Term)], body: Vector[Atom],
             group: Vector[String] = Vector.empty, distinct: Boolean = false,
             sort: Vector[(String, Boolean)] = Vector.empty, limit: Option[Long] = None,
             order: Int = -1, nCols: Int = -1): Val = {
      val rel = ng.fresh("v")
      rules += Rule(Head(rel, cols, group, distinct, sort, limit), body)
      Val(rel, cols.map(_._1), order, nCols)
    }

    def go(op: POp): Val = memo.getOrElseUpdate(op, op match {
      case Source(name, schema) =>
        cat.matrixCols.get(name) match {
          case Some(nc) => Val(name, schema, order = if (nc == 1) 1 else 2, nCols = nc)
          case None     => Val(name, schema)
        }

      case Filter(in, cond) =>
        val p = go(in); val vs = freshVars(p.schema)
        val varOf = p.schema.zip(vs).toMap
        val preds = conjuncts(cond).map(c => PredAtom(exprTerm(c, varOf)))
        emit(p.schema.zip(vs.map(TVar(_): Term)), RelAtom(p.rel, vs) +: preds)

      case SelectCols(in, cols) =>
        val p = go(in); val vs = freshVars(p.schema)
        val varOf = p.schema.zip(vs).toMap
        emit(cols.map(c => c -> (TVar(varOf(c)): Term)), Vector(RelAtom(p.rel, vs)))

      case w @ WithCols(in, newCols) =>
        val p = go(in); val vs = freshVars(p.schema)
        val varOf = p.schema.zip(vs).toMap
        val assigns = newCols.map { case (n, e) => n -> AssignAtom(ng.fresh(n), exprTerm(e, varOf)) }
        val outVar: Map[String, String] = varOf ++ assigns.map { case (n, a) => n -> a.v }
        emit(w.schema.map(c => c -> (TVar(outVar(c)): Term)),
             RelAtom(p.rel, vs) +: assigns.map(_._2))

      case Rename(in, mapping) =>
        val p = go(in); val vs = freshVars(p.schema)
        emit(p.schema.zip(vs).map { case (c, v) => mapping.getOrElse(c, c) -> (TVar(v): Term) },
             Vector(RelAtom(p.rel, vs)))

      case m @ Merge(l, r, how, leftOn, rightOn, _) =>
        val (pl, pr) = (go(l), go(r))
        val lv = freshVars(pl.schema)
        val lVarOf = pl.schema.zip(lv).toMap
        how match {
          case "inner" =>
            // Join variables get identical names (Datalog unification, §III-C).
            val joinVar: Map[String, String] = rightOn.zip(leftOn).map { case (rc, lc) => rc -> lVarOf(lc) }.toMap
            val rv = pr.schema.map(c => joinVar.getOrElse(c, ng.fresh(c)))
            val rVarOf = pr.schema.zip(rv).toMap
            val cols = m.leftOut.map { case (src, out) => out -> (TVar(lVarOf(src)): Term) } ++
                       m.rightOut.map { case (src, out) => out -> (TVar(rVarOf(src)): Term) }
            emit(cols, Vector(RelAtom(pl.rel, lv), RelAtom(pr.rel, rv)))
          case "cross" =>
            val rv = freshVars(pr.schema)
            val rVarOf = pr.schema.zip(rv).toMap
            val cols = m.leftOut.map { case (src, out) => out -> (TVar(lVarOf(src)): Term) } ++
                       m.rightOut.map { case (src, out) => out -> (TVar(rVarOf(src)): Term) }
            emit(cols, Vector(RelAtom(pl.rel, lv), RelAtom(pr.rel, rv)))
          case "left" | "right" | "full" =>
            // Outer joins keep distinct variables and carry an explicit ON
            // condition in the outer_* marker (§III-C).
            val rv = freshVars(pr.schema)
            val rVarOf = pr.schema.zip(rv).toMap
            val on = leftOn.zip(rightOn).map { case (lc, rc) =>
              TBin("=", TVar(lVarOf(lc)), TVar(rVarOf(rc))): Term }.reduce(TBin("and", _, _))
            val cols = m.leftOut.map { case (src, out) => out -> (TVar(lVarOf(src)): Term) } ++
                       m.rightOut.map { case (src, out) => out -> (TVar(rVarOf(src)): Term) }
            emit(cols, Vector(RelAtom(pl.rel, lv), RelAtom(pr.rel, rv, Some((how, on)))))
          case other => sys.error(s"merge: unsupported how='$other'")
        }

      case GroupAgg(in, keys, aggs) =>
        val p = go(in); val vs = freshVars(p.schema)
        val varOf = p.schema.zip(vs).toMap
        val assigns = aggs.map(a => AssignAtom(ng.fresh(a.out), TAgg(a.fn, exprTerm(a.arg, varOf), a.distinct)))
        val cols = keys.map(k => k -> (TVar(varOf(k)): Term)) ++
                   aggs.zip(assigns).map { case (a, as) => a.out -> (TVar(as.v): Term) }
        emit(cols, RelAtom(p.rel, vs) +: assigns, group = keys.map(varOf))

      case ScalarAgg(in, aggs) =>
        val p = go(in); val vs = freshVars(p.schema)
        val varOf = p.schema.zip(vs).toMap
        val assigns = aggs.map(a => AssignAtom(ng.fresh(a.out), TAgg(a.fn, exprTerm(a.arg, varOf), a.distinct)))
        emit(aggs.zip(assigns).map { case (a, as) => a.out -> (TVar(as.v): Term) },
             RelAtom(p.rel, vs) +: assigns)

      case SortLimit(in, by, asc, limit) =>
        val p = go(in); val vs = freshVars(p.schema)
        emit(p.schema.zip(vs.map(TVar(_): Term)), Vector(RelAtom(p.rel, vs)),
             sort = by.zip(asc.padTo(by.size, true)), limit = limit)

      case DistinctOp(in, cols) =>
        val p = go(in); val vs = freshVars(p.schema)
        val varOf = p.schema.zip(vs).toMap
        emit(cols.map(c => c -> (TVar(varOf(c)): Term)), Vector(RelAtom(p.rel, vs)), distinct = true)

      case SemiJoin(l, r, on, neq, negated) =>
        val (pl, pr) = (go(l), go(r))
        val lv = freshVars(pl.schema)
        val lVarOf = pl.schema.zip(lv).toMap
        // Correlate by giving the joined right-side columns the same vars.
        val joinVar: Map[String, String] = on.map { case (lc, rc) => rc -> lVarOf(lc) }.toMap
        val rv = pr.schema.map(c => joinVar.getOrElse(c, ng.fresh(c)))
        val rVarOf = pr.schema.zip(rv).toMap
        val neqPreds = neq.map { case (opS, lc, rc) =>
          PredAtom(TBin(opS, TVar(lVarOf(lc)), TVar(rVarOf(rc)))) }
        emit(pl.schema.zip(lv.map(TVar(_): Term)),
             Vector(RelAtom(pl.rel, lv), ExistsAtom(RelAtom(pr.rel, rv) +: neqPreds, negated)))

      case Pivot(in, index, columns, values, distinctVals) =>
        val p = go(in); val vs = freshVars(p.schema)
        val varOf = p.schema.zip(vs).toMap
        val (cv, vv) = (varOf(columns), varOf(values))
        val assigns = distinctVals.map { d =>
          val dc = d match { case i: Int => TConst(i.toLong); case v => TConst(v) }
          d.toString -> AssignAtom(ng.fresh("pv"),
            TAgg("sum", TIf(TBin("=", TVar(cv), dc), TVar(vv), TConst(0.0))))
        }
        emit((index -> (TVar(varOf(index)): Term)) +: assigns.map { case (n, a) => n -> (TVar(a.v): Term) },
             RelAtom(p.rel, vs) +: assigns.map(_._2), group = Vector(varOf(index)))

      case AlignJoin(l, r) =>
        // §III-C implicit join: UID both sides, join on the id (which the
        // optimizer can later eliminate as a unique-key self-join).
        def withUid(p: Val): Val = {
          val vs = freshVars(p.schema); val idv = ng.fresh("id")
          emit(("uid__" -> (TVar(idv): Term)) +: p.schema.zip(vs.map(TVar(_): Term)),
               Vector(RelAtom(p.rel, vs), AssignAtom(idv, TExt("uid", vs.map(TVar(_))))))
        }
        val (pl, pr) = (withUid(go(l)), withUid(go(r)))
        val id = ng.fresh("id")
        val lv = freshVars(pl.schema.tail); val rv = freshVars(pr.schema.tail)
        emit(pl.schema.tail.zip(lv.map(TVar(_): Term)) ++ pr.schema.tail.zip(rv.map(TVar(_): Term)),
             Vector(RelAtom(pl.rel, id +: lv), RelAtom(pr.rel, id +: rv)))

      case tm @ ToMatrix(in, cols) =>
        val p = go(in); val vs = freshVars(p.schema)
        val varOf = p.schema.zip(vs).toMap
        val idv = ng.fresh("id")
        val uid = AssignAtom(idv, TExt("uid", cols.map(c => TVar(varOf(c)))))
        val out = ("id" -> (TVar(idv): Term)) +:
          cols.zipWithIndex.map { case (c, i) => s"c$i" -> (TVar(varOf(c)): Term) }
        emit(out, Vector(RelAtom(p.rel, vs), uid),
             order = if (cols.size == 1) 1 else 2, nCols = cols.size)

      case EinsumOp(spec, operands) =>
        val ops = operands.map(go)
        val dops = ops.map(o => Einsum.DenseOp(o.rel, o.order, o.nCols))
        val lo = Einsum.lowerDense(spec, dops, ng)
        rules ++= lo.rules
        val schema = lo.order match {
          case 0 => Vector("c0")
          case 1 => Vector("id", "c0")
          case _ => "id" +: (0 until lo.nCols).map(i => s"c$i").toVector
        }
        Val(lo.rel, schema, lo.order, lo.nCols)

      case MatToDf(in, names) =>
        val p = go(in); val vs = freshVars(p.schema)
        emit(("id" -> (TVar(vs.head): Term)) +:
               names.zip(vs.tail).map { case (n, v) => n -> (TVar(v): Term) },
             Vector(RelAtom(p.rel, vs)))
    })

    val res = go(root)
    // The result must be the program's final rule (programSql invariant).
    val finalVal =
      if (rules.nonEmpty && rules.last.head.rel == res.rel) res
      else {
        val vs = freshVars(res.schema)
        val rel = ng.fresh("v")
        rules += Rule(Head(rel, res.schema.zip(vs.map(TVar(_): Term))), Vector(RelAtom(res.rel, vs)))
        Val(rel, res.schema)
      }
    Program(rules.toVector, finalVal.rel)
  }
}
