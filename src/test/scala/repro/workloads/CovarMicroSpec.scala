package repro.workloads

import repro.{Oracle, SparkSpec}
import repro.core.{Optimizer, Pipeline, SparkGen, SqlGen}
import repro.data.NotebookData
import repro.frontend.Lower

/** Covariance micro-benchmark correctness (Fig. 9 setup): dense and sparse
  * layouts, both backends, against a dense-table reference. */
class CovarMicroSpec extends SparkSpec {
  private val Rows = 500L
  private val Cols = 4
  private val cat = CovarMicro.catalogFor(Cols)

  private lazy val dense = NotebookData.matrixDense(spark, Rows, Cols, density = 0.3)
  private lazy val coo   = NotebookData.matrixCoo(spark, Rows, Cols, density = 0.3)
  private lazy val duck = {
    val c = Oracle.connect()
    Oracle.loadTable(c, "m", dense)
    Oracle.loadTable(c, "m_coo", coo)
    c
  }

  test("dense covariance via SparkGen matches reference") {
    val df = Pipeline.toSpark(CovarMicro.denseDf(Cols), cat, Map("m" -> dense), spark, level = 4)
    Oracle.assertEquivalentOn(duck, df, CovarMicro.denseRefSql(Cols))
  }

  test("dense covariance via generated DuckDB SQL matches reference") {
    val sql = Pipeline.toSql(CovarMicro.denseDf(Cols), cat, SqlGen.DuckDialect, level = 4)
    Oracle.assertSqlEquivalent(duck, sql, CovarMicro.denseRefSql(Cols))
  }

  test("dense covariance unoptimized (O0) matches reference") {
    val sql = Pipeline.toSql(CovarMicro.denseDf(Cols), cat, SqlGen.DuckDialect, level = 0)
    Oracle.assertSqlEquivalent(duck, sql, CovarMicro.denseRefSql(Cols))
  }

  test("sparse (COO) covariance via SparkGen matches reference") {
    val p = CovarMicro.sparseProgram()
    val df = SparkGen.compile(p, Map("m_coo" -> coo), cat, spark)
    Oracle.assertEquivalentOn(duck, df, CovarMicro.sparseRefSql(Cols))
  }

  test("sparse (COO) covariance via generated DuckDB SQL matches reference") {
    val sql = SqlGen.programSql(CovarMicro.sparseProgram(), cat, SqlGen.DuckDialect)
    Oracle.assertSqlEquivalent(duck, sql, CovarMicro.sparseRefSql(Cols))
  }

  test("dense covariance optimizer eliminates the id self-join") {
    val p0 = Lower.lower(CovarMicro.denseDf(Cols), cat)
    val p4 = Optimizer.optimize(p0, cat, 4)
    val selfJoins = p4.rules.map(r => r.relAtoms.count(_.rel == "m")).max
    assert(selfJoins <= 1, s"self-join on m not eliminated:\n${repro.core.TondIR.show(p4)}")
  }

  test("MiniNumPy dense covariance matches reference") {
    import repro.mini.MiniPandas
    val mini = Map("m" -> MiniPandas.Table(dense.columns.toVector, dense.collect().toVector.map(_.toSeq.toArray)))
    val t = MiniPandas.run(CovarMicro.denseDf(Cols), mini)
    Oracle.assertRowsEquivalentOn(duck, t.schema, t.rows.map(_.toSeq), CovarMicro.denseRefSql(Cols))
  }
}
