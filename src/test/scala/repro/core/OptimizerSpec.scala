package repro.core

import org.scalatest.funsuite.AnyFunSuite
import TondIR._

/** Unit tests for each optimizer pass, using the paper's own §IV examples. */
class OptimizerSpec extends AnyFunSuite {

  private val cat = Catalog.empty
    .withTable("R", Vector("a", "b", "c", "d"), unique = Set("a"))
    .withTable("S", Vector("id", "x", "y"), unique = Set("id"))
    .withTable("R4", Vector("e", "f", "g"))

  private def v(n: String) = TVar(n)

  // ---------------------------------------------------------- local DCE
  test("local DCE removes assignments not used by the head or other atoms") {
    // R1(a, s) :- R(a,b,c,d), (s=sum(b)), (t=c*d).   — t is dead
    val rule = Rule(
      Head("R1", Vector("a" -> v("a"), "s" -> v("s")), group = Vector("a")),
      Vector(RelAtom("R", Vector("a", "b", "c", "d")),
             AssignAtom("s", TAgg("sum", v("b"))),
             AssignAtom("t", TBin("*", v("c"), v("d")))))
    val out = Optimizer.localDce(rule)
    assert(out.assigns.map(_.v) == Vector("s"))
  }

  test("local DCE keeps assignments referenced by other assignments") {
    val rule = Rule(
      Head("R1", Vector("s" -> v("s"))),
      Vector(RelAtom("R", Vector("a", "b", "c", "d")),
             AssignAtom("t", TBin("*", v("c"), v("d"))),
             AssignAtom("s", TBin("+", v("t"), v("a")))))
    assert(Optimizer.localDce(rule).assigns.map(_.v).toSet == Set("s", "t"))
  }

  // --------------------------------------------------------- global DCE
  test("global DCE prunes head columns unused downstream (paper §IV example)") {
    // R1(a,b,c,d) :- R(a,b,c,d), (a<10), (c=d).
    // R2(a,s) group(a) :- R1(a,b,c,d), (s=sum(b)).
    val r1 = Rule(
      Head("R1", Vector("a" -> v("a"), "b" -> v("b"), "c" -> v("c"), "d" -> v("d"))),
      Vector(RelAtom("R", Vector("a", "b", "c", "d")),
             PredAtom(TBin("<", v("a"), TConst(10L))),
             PredAtom(TBin("=", v("c"), v("d")))))
    val r2 = Rule(
      Head("R2", Vector("a" -> v("a2"), "s" -> v("s")), group = Vector("a2")),
      Vector(RelAtom("R1", Vector("a2", "b2", "c2", "d2")),
             AssignAtom("s", TAgg("sum", v("b2")))))
    val out = Optimizer.globalDce(Program(Vector(r1, r2), "R2"))
    val h1 = out.rules.head.head
    assert(h1.colNames == Vector("a", "b"), TondIR.show(out))
    // consumer's positional binding must shrink accordingly
    assert(out.rules(1).relAtoms.head.vars.size == 2)
  }

  test("global DCE drops rules no longer reachable from the result") {
    val r1 = Rule(Head("Dead", Vector("a" -> v("a"))), Vector(RelAtom("R", Vector("a", "b", "c", "d"))))
    val r2 = Rule(Head("Live", Vector("a" -> v("x"))), Vector(RelAtom("R", Vector("x", "y", "z", "w"))))
    val out = Optimizer.globalDce(Program(Vector(r1, r2), "Live"))
    assert(out.rules.map(_.head.rel) == Vector("Live"))
  }

  // ---------------------------------------- group-aggregate elimination
  test("group-aggregate elimination on a unique key (paper §IV example)") {
    // R1(id, s) group(id) :- S(id, x, y), (s=sum(x)).  — id is S's PK
    val r = Rule(
      Head("R1", Vector("id" -> v("id"), "s" -> v("s")), group = Vector("id")),
      Vector(RelAtom("S", Vector("id", "x", "y")), AssignAtom("s", TAgg("sum", v("x")))))
    val out = Optimizer.groupAggElim(Program(Vector(r), "R1"), cat)
    val o = out.rules.head
    assert(o.head.group.isEmpty)
    assert(o.assigns.head.t == v("x"))       // sum(x) unwrapped to x
  }

  test("group-aggregate elimination unwraps count(*) to 1") {
    val r = Rule(
      Head("R1", Vector("id" -> v("id"), "n" -> v("n")), group = Vector("id")),
      Vector(RelAtom("S", Vector("id", "x", "y")), AssignAtom("n", TAgg("count", TConst(1L)))))
    val out = Optimizer.groupAggElim(Program(Vector(r), "R1"), cat)
    assert(out.rules.head.assigns.head.t == TConst(1L))
  }

  test("group-aggregate elimination leaves non-unique groupings alone") {
    val r = Rule(
      Head("R1", Vector("x" -> v("x"), "s" -> v("s")), group = Vector("x")),
      Vector(RelAtom("S", Vector("id", "x", "y")), AssignAtom("s", TAgg("sum", v("y")))))
    val out = Optimizer.groupAggElim(Program(Vector(r), "R1"), cat)
    assert(out.rules.head.head.group == Vector("x"))
  }

  // ------------------------------------------------ self-join elimination
  test("self-join elimination on a unique join column (paper §IV example)") {
    // T(x, y) :- S(id, x, y1), S(id, x2, y).
    val r = Rule(
      Head("T", Vector("x" -> v("x"), "y" -> v("y"))),
      Vector(RelAtom("S", Vector("id", "x", "y1")), RelAtom("S", Vector("id", "x2", "y"))))
    val out = Optimizer.selfJoinElim(Program(Vector(r), "T"), cat)
    val o = out.rules.head
    assert(o.relAtoms.size == 1, TondIR.show(out))
    assert(o.head.cols == Vector("x" -> v("x"), "y" -> v("y1")))
  }

  test("self-join on a non-unique column is kept") {
    val r = Rule(
      Head("T", Vector("a" -> v("x"))),
      Vector(RelAtom("S", Vector("i1", "x", "y")), RelAtom("S", Vector("i2", "x", "y2"))))
    val out = Optimizer.selfJoinElim(Program(Vector(r), "T"), cat)
    assert(out.rules.head.relAtoms.size == 2)
  }

  // ------------------------------------------------------- rule inlining
  test("rule inlining fuses a filter chain into the aggregate (paper §IV example)") {
    // R2(b,c,d) :- R1(a,b,c,d), (a>1000).
    // R3(b,d)   :- R2(b,c,d), (c<>"A").
    // R5(e,g)   :- R4(e,f,g), (f>100).
    // R6(b,g)   :- R3(b,x), R5(x,g).
    // R7(b,m) group(b) :- R6(b,g), (m=max(g)).
    implicit def s2t(s: String): TVar = v(s)
    val rules = Vector(
      Rule(Head("R2", Vector("b" -> v("b"), "c" -> v("c"), "d" -> v("d"))),
           Vector(RelAtom("R", Vector("a", "b", "c", "d")), PredAtom(TBin(">", v("a"), TConst(1000L))))),
      Rule(Head("R3", Vector("b" -> v("b2"), "d" -> v("d2"))),
           Vector(RelAtom("R2", Vector("b2", "c2", "d2")), PredAtom(TBin("<>", v("c2"), TConst("A"))))),
      Rule(Head("R5", Vector("e" -> v("e"), "g" -> v("g"))),
           Vector(RelAtom("R4", Vector("e", "f", "g")), PredAtom(TBin(">", v("f"), TConst(100L))))),
      Rule(Head("R6", Vector("b" -> v("b3"), "g" -> v("g3"))),
           Vector(RelAtom("R3", Vector("b3", "x3")), RelAtom("R5", Vector("x3", "g3")))),
      Rule(Head("R7", Vector("b" -> v("b4"), "m" -> v("m")), group = Vector("b4")),
           Vector(RelAtom("R6", Vector("b4", "g4")), AssignAtom("m", TAgg("max", v("g4"))))))
    val out = Optimizer.inlineRules(Program(rules, "R7"))
    assert(out.rules.size == 1, TondIR.show(out))
    val fused = out.rules.head
    assert(fused.relAtoms.map(_.rel).sorted == Vector("R", "R4"))
    assert(fused.body.count(_.isInstanceOf[PredAtom]) == 3)
    assert(fused.head.group.nonEmpty)
  }

  test("flow breakers are not inlined (Table VII)") {
    val agg = Rule(Head("A", Vector("s" -> v("s"))),
      Vector(RelAtom("S", Vector("id", "x", "y")), AssignAtom("s", TAgg("sum", v("x")))))
    val sorted = Rule(Head("B", Vector("x" -> v("x1")), sort = Vector(("x", true)), limit = Some(5)),
      Vector(RelAtom("S", Vector("i1", "x1", "y1"))))
    val dist = Rule(Head("C", Vector("x" -> v("x2")), distinct = true),
      Vector(RelAtom("S", Vector("i2", "x2", "y2"))))
    val sink = Rule(Head("D", Vector("a" -> v("a"), "b" -> v("b"), "c" -> v("c"))),
      Vector(RelAtom("A", Vector("a")), RelAtom("B", Vector("b")), RelAtom("C", Vector("c"))))
    val p = Program(Vector(agg, sorted, dist, sink), "D")
    assert(Optimizer.inlineRules(p).rules.size == 4)
    assert(Optimizer.isFlowBreaker(agg, p))
    assert(Optimizer.isFlowBreaker(sorted, p))
    assert(Optimizer.isFlowBreaker(dist, p))
    assert(Optimizer.isFlowBreaker(sink, p))
  }

  test("outer-join producers are never spliced behind the join") {
    val filt = Rule(Head("F", Vector("id" -> v("i"), "x" -> v("xx"))),
      Vector(RelAtom("S", Vector("i", "xx", "yy")), PredAtom(TBin(">", v("xx"), TConst(0L)))))
    val lj = Rule(Head("L", Vector("a" -> v("a"), "x" -> v("fx"))),
      Vector(RelAtom("R", Vector("a", "b", "c", "d")),
             RelAtom("F", Vector("fid", "fx"), Some(("left", TBin("=", v("a"), v("fid")))))))
    val out = Optimizer.inlineRules(Program(Vector(filt, lj), "L"))
    assert(out.rules.size == 2)
  }

  test("optimization levels compose monotonically (rule count never grows)") {
    val rules = Vector(
      Rule(Head("P1", Vector("a" -> v("a"), "b" -> v("b"))),
           Vector(RelAtom("R", Vector("a", "b", "c", "d")), PredAtom(TBin("<", v("a"), TConst(5L))))),
      Rule(Head("P2", Vector("a" -> v("a1"), "s" -> v("s")), group = Vector("a1")),
           Vector(RelAtom("P1", Vector("a1", "b1")), AssignAtom("s", TAgg("sum", v("b1"))))))
    val p = Program(rules, "P2")
    val sizes = (0 to 4).map(l => Optimizer.optimize(p, cat, l).rules.size)
    assert(sizes.zip(sizes.tail).forall { case (x, y) => y <= x })
  }
}
