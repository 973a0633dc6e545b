package repro.frontend

import repro.core.Catalog

/** Embedded Pandas/NumPy-like DSL (§II-A, Table II).
  *
  * The paper's frontend parses decorated CPython functions into ASTs and
  * A-normalizes them; here the same surface operations are embedded as a
  * lazy operator DAG (each call allocates one node — already one-op-per-
  * binding, i.e. ANF by construction). [[Lower]] translates the DAG to
  * TondIR with the Table V rules; [[repro.mini.MiniPandas]] interprets the
  * same DAG eagerly as the "Python" baseline.
  *
  * Schemas are inferred at construction time from the [[Catalog]] (the
  * paper's database-catalog/decorator contextual information, §III-A),
  * including Pandas' implicit `_x`/`_y` suffix renaming on merges.
  */
object Dsl {

  // ----------------------------------------------------------- expressions
  sealed trait PExpr {
    def +(o: PExpr)  = PBin("+", this, o)
    def -(o: PExpr)  = PBin("-", this, o)
    def *(o: PExpr)  = PBin("*", this, o)
    def /(o: PExpr)  = PBin("/", this, o)
    def <(o: PExpr)  = PBin("<", this, o)
    def <=(o: PExpr) = PBin("<=", this, o)
    def >(o: PExpr)  = PBin(">", this, o)
    def >=(o: PExpr) = PBin(">=", this, o)
    def ===(o: PExpr) = PBin("=", this, o)
    def !==(o: PExpr) = PBin("<>", this, o)
    def &&(o: PExpr) = PBin("and", this, o)
    def ||(o: PExpr) = PBin("or", this, o)
    def like(pat: String)    = PLike(this, pat, negated = false)
    def notLike(pat: String) = PLike(this, pat, negated = true)
    def in(vals: Any*)       = PIn(this, vals.toVector)
    def year                 = PFun("year", Vector(this))
    def substr(from: Int, len: Int) = PFun("substr", Vector(this, PLit(from), PLit(len)))
  }
  final case class PCol(name: String) extends PExpr
  final case class PLit(v: Any) extends PExpr
  final case class PBin(op: String, l: PExpr, r: PExpr) extends PExpr
  final case class PIf(c: PExpr, t: PExpr, e: PExpr) extends PExpr
  final case class PLike(e: PExpr, pat: String, negated: Boolean) extends PExpr
  final case class PIn(e: PExpr, vals: Vector[Any]) extends PExpr
  final case class PFun(fn: String, args: Vector[PExpr]) extends PExpr

  def col(n: String): PExpr = PCol(n)
  def lit(v: Any): PExpr = PLit(v)
  def date(s: String): PExpr = PLit(java.time.LocalDate.parse(s))
  def when(c: PExpr, t: PExpr, e: PExpr): PExpr = PIf(c, t, e)

  /** One aggregate output: name, function (sum/min/max/avg/count), argument,
    * DISTINCT flag. `count(*)` is `AggSpec(n, "count", PLit(1))`. */
  final case class AggSpec(out: String, fn: String, arg: PExpr, distinct: Boolean = false)

  // ------------------------------------------------------------- operators
  sealed trait POp { def schema: Vector[String] }

  final case class Source(name: String, schema: Vector[String]) extends POp
  final case class Filter(in: POp, cond: PExpr) extends POp { val schema = in.schema }
  final case class SelectCols(in: POp, cols: Vector[String]) extends POp { val schema = cols }
  final case class WithCols(in: POp, newCols: Vector[(String, PExpr)]) extends POp {
    val schema = in.schema.filterNot(newCols.map(_._1).contains) ++ newCols.map(_._1)
  }
  final case class Rename(in: POp, mapping: Map[String, String]) extends POp {
    val schema = in.schema.map(c => mapping.getOrElse(c, c))
  }
  /** Pandas merge with implicit `_x`/`_y` suffixing of shared non-key
    * columns (§III-C "Implicit Renaming"). */
  final case class Merge(l: POp, r: POp, how: String,
                         leftOn: Vector[String], rightOn: Vector[String],
                         suffixes: (String, String)) extends POp {
    private val sharedKeys = leftOn.zip(rightOn).collect { case (a, b) if a == b => a }
    private val overlap = (l.schema.toSet intersect r.schema.toSet) -- sharedKeys
    val leftOut: Vector[(String, String)] =            // source col → output name
      l.schema.map(c => c -> (if (overlap(c)) c + suffixes._1 else c))
    val rightOut: Vector[(String, String)] =
      r.schema.filterNot(c => sharedKeys.contains(c))
        .map(c => c -> (if (overlap(c)) c + suffixes._2 else c))
    val schema = leftOut.map(_._2) ++ rightOut.map(_._2)
  }
  final case class GroupAgg(in: POp, keys: Vector[String], aggs: Vector[AggSpec]) extends POp {
    val schema = keys ++ aggs.map(_.out)
  }
  /** Whole-relation aggregate → one-row result (for `df.c.max()` style
    * scalars, combined with crossMerge). */
  final case class ScalarAgg(in: POp, aggs: Vector[AggSpec]) extends POp {
    val schema = aggs.map(_.out)
  }
  final case class SortLimit(in: POp, by: Vector[String], asc: Vector[Boolean],
                             limit: Option[Long]) extends POp { val schema = in.schema }
  final case class DistinctOp(in: POp, cols: Vector[String]) extends POp { val schema = cols }
  /** Semi/anti join (Pandas `isin` / filtering merges): keep rows of `l`
    * with (no) match in `r` on the given column pairs plus optional
    * non-equi conditions (op, leftCol, rightCol). */
  final case class SemiJoin(l: POp, r: POp, on: Vector[(String, String)],
                            neq: Vector[(String, String, String)],
                            negated: Boolean) extends POp { val schema = l.schema }
  /** pivot_table(index, columns, values, aggfunc='sum'); distinct values of
    * `columns` are supplied (decorator contextual info, §III-C). */
  final case class Pivot(in: POp, index: String, columns: String, values: String,
                         distinctVals: Vector[Any]) extends POp {
    val schema = index +: distinctVals.map(_.toString)
  }

  /** Implicit join (§III-C): append another DataFrame's columns positionally
    * — Pandas' `df3['b'] = df2['b']` pattern. Both sides get a UID and are
    * joined on it; the optimizer later removes the join when it is a
    * self-join on the generated unique id. Assumes equal row counts and
    * disjoint column names. */
  final case class AlignJoin(l: POp, r: POp) extends POp { val schema = l.schema ++ r.schema }

  // NumPy bridge ---------------------------------------------------------
  /** DataFrame → dense array `(id, c0..)`; the id is a UID ordered by the
    * selected columns (§III-E Unique ID Generation). */
  final case class ToMatrix(in: POp, cols: Vector[String]) extends POp {
    val schema = "id" +: cols.indices.map(i => s"c$i").toVector
    def nCols: Int = cols.size
  }
  /** Dense einsum over matrices/vectors produced by [[ToMatrix]] or prior
    * einsums. Operand shapes are tracked by [[Lower]]. */
  final case class EinsumOp(spec: String, operands: Vector[POp]) extends POp {
    val schema = Vector.empty // filled during lowering (shape-dependent)
  }
  /** Array → DataFrame with the given column names (keeps the id). */
  final case class MatToDf(in: POp, names: Vector[String]) extends POp {
    val schema = "id" +: names
  }

  // ------------------------------------------------------------ fluent API
  /** Pandas-style DataFrame handle. */
  final class Df(val op: POp) {
    def schema: Vector[String] = op.schema
    def filter(e: PExpr): Df            = new Df(Filter(op, e))
    def select(cols: String*): Df       = new Df(SelectCols(op, cols.toVector))
    def withCol(n: String, e: PExpr): Df = new Df(WithCols(op, Vector(n -> e)))
    def withCols(cs: (String, PExpr)*): Df = new Df(WithCols(op, cs.toVector))
    def rename(m: (String, String)*): Df = new Df(Rename(op, m.toMap))

    def merge(o: Df, on: Seq[String], how: String = "inner",
              suffixes: (String, String) = ("_x", "_y")): Df =
      new Df(Merge(op, o.op, how, on.toVector, on.toVector, suffixes))
    def mergeOn(o: Df, leftOn: Seq[String], rightOn: Seq[String], how: String = "inner",
                suffixes: (String, String) = ("_x", "_y")): Df =
      new Df(Merge(op, o.op, how, leftOn.toVector, rightOn.toVector, suffixes))
    def crossMerge(o: Df): Df =
      new Df(Merge(op, o.op, "cross", Vector.empty, Vector.empty, ("_x", "_y")))

    def groupby(keys: String*): Grouped = new Grouped(op, keys.toVector)
    def aggregate(aggs: AggSpec*): Df   = new Df(ScalarAgg(op, aggs.toVector))

    def sortValues(by: Seq[String], asc: Seq[Boolean]): Df =
      new Df(SortLimit(op, by.toVector, asc.toVector, None))
    def sortValues(by: String): Df = sortValues(Seq(by), Seq(true))
    def head(n: Long): Df = op match {
      // Merge separately-defined sort+limit into a single rule (§III-E).
      case SortLimit(in, by, asc, None) => new Df(SortLimit(in, by, asc, Some(n)))
      case _ => new Df(SortLimit(op, Vector.empty, Vector.empty, Some(n)))
    }
    def unique(cols: String*): Df = new Df(DistinctOp(op, cols.toVector))

    def isin(myCol: String, other: Df, otherCol: String): Df =
      new Df(SemiJoin(op, other.op, Vector(myCol -> otherCol), Vector.empty, negated = false))
    def notin(myCol: String, other: Df, otherCol: String): Df =
      new Df(SemiJoin(op, other.op, Vector(myCol -> otherCol), Vector.empty, negated = true))
    def semiJoin(other: Df, on: Seq[(String, String)],
                 neq: Seq[(String, String, String)] = Seq.empty): Df =
      new Df(SemiJoin(op, other.op, on.toVector, neq.toVector, negated = false))
    def antiJoin(other: Df, on: Seq[(String, String)],
                 neq: Seq[(String, String, String)] = Seq.empty): Df =
      new Df(SemiJoin(op, other.op, on.toVector, neq.toVector, negated = true))

    def alignWith(other: Df): Df = new Df(AlignJoin(op, other.op))

    def pivotTable(index: String, columns: String, values: String,
                   distinctVals: Seq[Any]): Df =
      new Df(Pivot(op, index, columns, values, distinctVals.toVector))

    def toMatrix(cols: String*): Arr = new Arr(ToMatrix(op, cols.toVector))
  }

  /** Pandas groupby handle. */
  final class Grouped(in: POp, keys: Vector[String]) {
    def agg(aggs: AggSpec*): Df = new Df(GroupAgg(in, keys, aggs.toVector))
    def sum(cols: String*): Df  = agg(cols.map(c => AggSpec(c, "sum", PCol(c))): _*)
    def count(out: String): Df  = agg(AggSpec(out, "count", PLit(1)))
  }

  /** NumPy array handle (dense layout). */
  final class Arr(val op: POp) {
    def toDf(names: String*): Df = new Df(MatToDf(op, names.toVector))
  }

  object np {
    def einsum(spec: String, operands: Arr*): Arr =
      new Arr(EinsumOp(spec, operands.map(_.op).toVector))
  }

  /** Entry point: a named base relation with its catalog schema. */
  def table(name: String)(implicit cat: Catalog): Df = new Df(Source(name, cat.schema(name)))

  /** Entry point: a base relation registered as a dense matrix `(id, c0..)`
    * (decorator-declared layout, §II-B). */
  def matrixTable(name: String)(implicit cat: Catalog): Arr = {
    require(cat.matrixCols.contains(name), s"$name is not a registered matrix")
    new Arr(Source(name, cat.schema(name)))
  }
}
