package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.Oracle
import TondIR._

/** Feature-level TondIR → SQL tests, executed on DuckDB over tiny inline
  * tables (§III-E: CTE chaining, sort/limit placement, UID windows,
  * VALUES relations, exists, outer joins, dialect quirks). */
class SqlGenSpec extends AnyFunSuite {

  private val cat = Catalog.empty
    .withTable("t", Vector("k", "s", "x"), unique = Set("k"))
    .withTable("u", Vector("k", "y"))

  private lazy val duck = {
    val c = Oracle.connect()
    c.createStatement.execute(
      "CREATE TABLE t AS SELECT * FROM (VALUES (1,'a',10.0),(2,'b',20.0),(3,'a',30.0),(4,'c',40.0)) v(k,s,x)")
    c.createStatement.execute(
      "CREATE TABLE u AS SELECT * FROM (VALUES (1,1.5),(1,2.5),(3,3.5),(9,9.9)) v(k,y)")
    c
  }

  private def run(p: Program, expected: String): Unit =
    Oracle.assertSqlEquivalent(duck, SqlGen.programSql(p, cat, SqlGen.DuckDialect), expected)

  private def v(n: String) = TVar(n)

  test("single rule: filter + computed column") {
    val r = Rule(Head("r", Vector("k" -> v("k"), "d" -> v("d"))),
      Vector(RelAtom("t", Vector("k", "s", "x")),
             PredAtom(TBin(">", v("x"), TConst(15.0))),
             AssignAtom("d", TBin("*", v("x"), TConst(2.0)))))
    run(Program(Vector(r), "r"), "SELECT k, x*2 AS d FROM t WHERE x > 15")
  }

  test("CTE chain: each non-final rule becomes a WITH clause") {
    val r1 = Rule(Head("f", Vector("k" -> v("k"), "x" -> v("x"))),
      Vector(RelAtom("t", Vector("k", "s", "x")), PredAtom(TBin(">", v("x"), TConst(10.0)))))
    val r2 = Rule(Head("g", Vector("n" -> v("n"))),
      Vector(RelAtom("f", Vector("k2", "x2")), AssignAtom("n", TAgg("count", TConst(1L)))))
    val sql = SqlGen.programSql(Program(Vector(r1, r2), "g"), cat, SqlGen.DuckDialect)
    assert(sql.startsWith("WITH f(k, x) AS"))
    run(Program(Vector(r1, r2), "g"), "SELECT COUNT(*) AS n FROM t WHERE x > 10")
  }

  test("join via repeated variable becomes JOIN ... ON") {
    val r = Rule(Head("r", Vector("k" -> v("k"), "y" -> v("y"))),
      Vector(RelAtom("t", Vector("k", "s", "x")), RelAtom("u", Vector("k", "y"))))
    val sql = SqlGen.programSql(Program(Vector(r), "r"), cat, SqlGen.DuckDialect)
    assert(sql.contains("JOIN u AS t2 ON"))
    run(Program(Vector(r), "r"), "SELECT t.k AS k, y FROM t JOIN u ON t.k = u.k")
  }

  test("group + having (aggregate predicate)") {
    val r = Rule(Head("r", Vector("s" -> v("s"), "tot" -> v("tot")), group = Vector("s")),
      Vector(RelAtom("t", Vector("k", "s", "x")),
             AssignAtom("tot", TAgg("sum", v("x"))),
             PredAtom(TBin(">", TAgg("sum", v("x")), TConst(15.0)))))
    run(Program(Vector(r), "r"),
      "SELECT s, SUM(x) AS tot FROM t GROUP BY s HAVING SUM(x) > 15")
  }

  test("sort + limit live in the final SELECT (not a CTE)") {
    val r = Rule(Head("r", Vector("k" -> v("k"), "x" -> v("x")),
                      sort = Vector(("x", false)), limit = Some(2)),
      Vector(RelAtom("t", Vector("k", "s", "x"))))
    run(Program(Vector(r), "r"), "SELECT k, x FROM t ORDER BY x DESC LIMIT 2")
  }

  test("distinct head flag") {
    val r = Rule(Head("r", Vector("s" -> v("s")), distinct = true),
      Vector(RelAtom("t", Vector("k", "s", "x"))))
    run(Program(Vector(r), "r"), "SELECT DISTINCT s FROM t")
  }

  test("exists becomes a correlated EXISTS subquery") {
    val r = Rule(Head("r", Vector("k" -> v("k"))),
      Vector(RelAtom("t", Vector("k", "s", "x")),
             ExistsAtom(Vector(RelAtom("u", Vector("k", "y")),
                               PredAtom(TBin(">", v("y"), TConst(2.0)))))))
    run(Program(Vector(r), "r"),
      "SELECT k FROM t WHERE EXISTS (SELECT 1 FROM u WHERE u.k = t.k AND y > 2)")
  }

  test("not exists becomes NOT EXISTS") {
    val r = Rule(Head("r", Vector("k" -> v("k"))),
      Vector(RelAtom("t", Vector("k", "s", "x")),
             ExistsAtom(Vector(RelAtom("u", Vector("k", "y"))), negated = true)))
    run(Program(Vector(r), "r"),
      "SELECT k FROM t WHERE NOT EXISTS (SELECT 1 FROM u WHERE u.k = t.k)")
  }

  test("outer_left marker becomes LEFT JOIN with ON clause") {
    val r = Rule(Head("r", Vector("k" -> v("k"), "y" -> v("y"))),
      Vector(RelAtom("t", Vector("k", "s", "x")),
             RelAtom("u", Vector("k2", "y"), Some(("left", TBin("=", v("k"), v("k2")))))))
    run(Program(Vector(r), "r"),
      "SELECT t.k AS k, y FROM t LEFT JOIN u ON t.k = u.k")
  }

  test("constant relation renders as an inline VALUES table") {
    val r = Rule(Head("r", Vector("i" -> v("i"), "k" -> v("k"))),
      Vector(RelAtom("t", Vector("k", "s", "x")),
             ConstAtom(Vector("i"), Vector(Vector(TConst(0L)), Vector(TConst(1L))))))
    run(Program(Vector(r), "r"),
      "SELECT i, k FROM t CROSS JOIN (VALUES (0),(1)) vals(i)")
  }

  test("UID renders as a 0-based row_number window") {
    val r = Rule(Head("r", Vector("id" -> v("id"), "k" -> v("k"))),
      Vector(RelAtom("t", Vector("k", "s", "x")),
             AssignAtom("id", TExt("uid", Seq(v("k"))))))
    run(Program(Vector(r), "r"),
      "SELECT ROW_NUMBER() OVER (ORDER BY k) - 1 AS id, k FROM t")
  }

  test("like / not-like / in-list / if render correctly") {
    val r = Rule(Head("r", Vector("k" -> v("k"), "f" -> v("f"))),
      Vector(RelAtom("t", Vector("k", "s", "x")),
             PredAtom(TBin("like", v("s"), TConst("%a%"))),
             PredAtom(TBin("in", v("k"), TExt("list", Seq(TConst(1L), TConst(3L))))),
             AssignAtom("f", TIf(TBin(">", v("x"), TConst(15.0)), TConst("hi"), TConst("lo")))))
    run(Program(Vector(r), "r"),
      "SELECT k, CASE WHEN x > 15 THEN 'hi' ELSE 'lo' END AS f FROM t " +
      "WHERE s LIKE '%a%' AND k IN (1, 3)")
  }

  test("string constants are escaped") {
    val r = Rule(Head("r", Vector("c" -> v("c"))),
      Vector(RelAtom("t", Vector("k", "s", "x")), AssignAtom("c", TConst("it's"))))
    run(Program(Vector(r), "r"), "SELECT 'it''s' AS c FROM t")
  }

  test("result relation must be the last rule") {
    val r = Rule(Head("r", Vector("k" -> v("k"))), Vector(RelAtom("t", Vector("k", "s", "x"))))
    intercept[IllegalArgumentException] {
      SqlGen.programSql(Program(Vector(r), "other"), cat, SqlGen.DuckDialect)
    }
  }

  test("both dialects emit identical SQL apart from VALUES relations") {
    val r = Rule(Head("r", Vector("k" -> v("k"))),
      Vector(RelAtom("t", Vector("k", "s", "x")), PredAtom(TBin(">", v("x"), TConst(10.0)))))
    val d = SqlGen.programSql(Program(Vector(r), "r"), cat, SqlGen.DuckDialect)
    val s = SqlGen.programSql(Program(Vector(r), "r"), cat, SqlGen.SparkDialect)
    assert(d == s)
  }
}
