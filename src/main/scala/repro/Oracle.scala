package repro

import java.sql.{DriverManager, Connection}
import org.apache.spark.sql.{DataFrame, Row}
import org.apache.spark.sql.types._

/** DuckDB correctness oracle.
  *
  * ``assertEquivalent(sparkDf, sql, tables)`` runs ``sql`` on DuckDB
  * (via JDBC, in-process) over ``tables`` and asserts the rows match
  * ``sparkDf``. This catches wrong results from a rewritten plan or a
  * custom operator — "it ran" is not "it is correct".
  *
  * Extensions over the stock oracle (documented in DESIGN.md):
  *  - tables are created with types derived from the Spark schema (so
  *    reference SQL can aggregate/compare without explicit casts);
  *  - numeric cells compare with a small absolute+relative tolerance:
  *    different engines sum floating-point columns in different orders.
  *
  * Alias every output column identically on both sides (Spark names
  * ``count(*)`` as ``count(1)``, DuckDB as ``count_star()``). Project
  * to scalar columns — array/map/struct are not comparable here.
  */
object Oracle {

  private def duckType(dt: DataType): String = dt match {
    case LongType | IntegerType | ShortType | ByteType => "BIGINT"
    case DoubleType | FloatType | _: DecimalType       => "DOUBLE"
    case DateType                                      => "DATE"
    case TimestampType                                 => "TIMESTAMP"
    case BooleanType                                   => "BOOLEAN"
    case _                                             => "VARCHAR"
  }

  /** Load a Spark DataFrame into DuckDB as a typed table. */
  def loadTable(conn: Connection, name: String, df: DataFrame): Unit = {
    val fields = df.schema.fields
    conn.createStatement.execute(
      s"CREATE OR REPLACE TABLE $name (${fields.map(f => s"${f.name} ${duckType(f.dataType)}").mkString(", ")})")
    val ps = conn.prepareStatement(
      s"INSERT INTO $name VALUES (${fields.map(_ => "?").mkString(",")})")
    var batch = 0
    df.collect().foreach { r =>
      fields.indices.foreach { i =>
        r.get(i) match {
          case null                    => ps.setObject(i + 1, null)
          case d: java.sql.Date        => ps.setDate(i + 1, d)
          case d: java.time.LocalDate  => ps.setDate(i + 1, java.sql.Date.valueOf(d))
          case n: java.lang.Number     => ps.setObject(i + 1, n)
          case b: java.lang.Boolean    => ps.setBoolean(i + 1, b)
          case x                       => ps.setString(i + 1, x.toString)
        }
      }
      ps.addBatch(); batch += 1
      if (batch % 5000 == 0) ps.executeBatch()
    }
    ps.executeBatch(); ps.close()
  }

  private sealed trait Cell
  private final case class NumCell(v: Double) extends Cell { override def toString = f"$v%.6f" }
  private final case class StrCell(s: String) extends Cell { override def toString = s }

  private def toCell(v: Any): Cell = v match {
    case null                        => StrCell("∅")
    case d: Double                   => NumCell(d)
    case f: Float                    => NumCell(f.toDouble)
    case bd: java.math.BigDecimal    => NumCell(bd.doubleValue)
    case bd: BigDecimal              => NumCell(bd.doubleValue)
    case n: java.lang.Number         => NumCell(n.doubleValue)
    case x                           => StrCell(x.toString)
  }

  private def cellsMatch(a: Cell, b: Cell): Boolean = (a, b) match {
    case (NumCell(x), NumCell(y)) =>
      math.abs(x - y) <= 1e-6 + 1e-8 * math.max(math.abs(x), math.abs(y))
    case (NumCell(x), StrCell(s)) => s == "∅" && x.isNaN
    case (StrCell(s), NumCell(y)) => s == "∅" && y.isNaN
    case (StrCell(x), StrCell(y)) => x == y
  }

  private def rowsMatch(a: Seq[Cell], b: Seq[Cell]): Boolean =
    a.size == b.size && a.zip(b).forall { case (x, y) => cellsMatch(x, y) }

  /** Canonicalize: reorder columns alphabetically, convert to cells. */
  private def canon(rows: Seq[Row], cols: Seq[String]): Seq[Seq[Cell]] = {
    val order = cols.map(_.toLowerCase).sorted
    val idx   = order.map(c => cols.indexWhere(_.toLowerCase == c))
    rows.map(r => idx.map(i => toCell(r.get(i))))
      .sortBy(_.map {
        // coarse numeric sort key: ties resolved by the tolerant matcher
        case NumCell(v) => f"${math.rint(v * 100) / 100}%020.2f"
        case StrCell(s) => s
      }.mkString(""))
  }

  /** Compare two canonicalized row sets with numeric tolerance; fall back to
    * greedy multiset matching when coarse sort keys disagree at boundaries. */
  private def equivalent(a: Seq[Seq[Cell]], b: Seq[Seq[Cell]]): Boolean = {
    if (a.size != b.size) return false
    if (a.zip(b).forall { case (x, y) => rowsMatch(x, y) }) return true
    val remaining = scala.collection.mutable.ArrayBuffer(b: _*)
    a.forall { row =>
      val i = remaining.indexWhere(rowsMatch(row, _))
      if (i < 0) false else { remaining.remove(i); true }
    }
  }

  def connect(): Connection = {
    Class.forName("org.duckdb.DuckDBDriver")
    DriverManager.getConnection("jdbc:duckdb:")
  }

  /** Run a query on an existing DuckDB connection → (columns, rows). */
  def query(conn: Connection, sql: String): (Seq[String], Seq[Row]) = {
    val rs   = conn.createStatement.executeQuery(sql)
    val meta = rs.getMetaData
    val cols = (1 to meta.getColumnCount).map(meta.getColumnLabel)
    val rows = Iterator.continually(rs).takeWhile(_.next())
      .map(r => Row.fromSeq((1 to cols.size).map(r.getObject))).toSeq
    (cols, rows)
  }

  /** Assert two SQL statements produce equivalent results on the same
    * (pre-loaded) DuckDB connection. */
  def assertSqlEquivalent(conn: Connection, sqlA: String, sqlB: String): Unit = {
    val (ca, ra) = query(conn, sqlA)
    val (cb, rb) = query(conn, sqlB)
    require(ca.map(_.toLowerCase).toSet == cb.map(_.toLowerCase).toSet,
      s"column mismatch: ${ca.sorted} vs ${cb.sorted}")
    val a = canon(ra, ca); val b = canon(rb, cb)
    require(equivalent(a, b),
      s"SQL results differ (${a.size} vs ${b.size} rows):\n  A: ${a.take(3)}\n  B: ${b.take(3)}")
  }

  /** Assert a Spark result matches reference SQL on a pre-loaded connection. */
  def assertEquivalentOn(conn: Connection, sparkDf: DataFrame, sql: String): Unit = {
    val (dCols, dRows) = query(conn, sql)
    val sCols = sparkDf.columns.toSeq
    require(
      dCols.map(_.toLowerCase).toSet == sCols.map(_.toLowerCase).toSet,
      s"column mismatch: spark=${sCols.sorted} duckdb=${dCols.sorted} — alias every output column")
    val got = canon(sparkDf.collect().toSeq, sCols)
    val exp = canon(dRows, dCols)
    require(equivalent(got, exp),
      s"result mismatch (${got.size} vs ${exp.size} rows):\n" +
      s"  first spark rows: ${got.take(3).map(_.mkString("[", ", ", "]"))}\n" +
      s"  first duck rows:  ${exp.take(3).map(_.mkString("[", ", ", "]"))}")
  }

  /** Assert arbitrary local rows (schema, rows) match reference SQL results
    * on a pre-loaded connection — used for the MiniPandas baseline. */
  def assertRowsEquivalentOn(conn: Connection, cols: Seq[String], rows: Seq[Seq[Any]], sql: String): Unit = {
    val (dCols, dRows) = query(conn, sql)
    require(dCols.map(_.toLowerCase).toSet == cols.map(_.toLowerCase).toSet,
      s"column mismatch: local=${cols.sorted} duckdb=${dCols.sorted}")
    val got = canon(rows.map(Row.fromSeq), cols)
    val exp = canon(dRows, dCols)
    require(equivalent(got, exp),
      s"result mismatch (${got.size} vs ${exp.size} rows):\n" +
      s"  first local rows: ${got.take(3).map(_.mkString("[", ", ", "]"))}\n" +
      s"  first duck rows:  ${exp.take(3).map(_.mkString("[", ", ", "]"))}")
  }

  def assertEquivalent(sparkDf: DataFrame, sql: String, tables: (String, DataFrame)*): Unit = {
    Class.forName("org.duckdb.DuckDBDriver")
    val conn = DriverManager.getConnection("jdbc:duckdb:")
    try {
      tables.foreach { case (name, df) => loadTable(conn, name, df) }
      val rs   = conn.createStatement.executeQuery(sql)
      val meta = rs.getMetaData
      val dCols = (1 to meta.getColumnCount).map(meta.getColumnLabel)
      val dRows = Iterator
        .continually(rs)
        .takeWhile(_.next())
        .map(r => Row.fromSeq((1 to dCols.size).map(r.getObject)))
        .toSeq
      val sCols = sparkDf.columns.toSeq
      require(
        dCols.map(_.toLowerCase).toSet == sCols.map(_.toLowerCase).toSet,
        s"column mismatch: spark=${sCols.sorted} duckdb=${dCols.sorted} — alias every output column")
      val got = canon(sparkDf.collect().toSeq, sCols)
      val exp = canon(dRows, dCols)
      require(equivalent(got, exp),
        s"result mismatch (${got.size} vs ${exp.size} rows):\n" +
        s"  first spark rows: ${got.take(3).map(_.mkString("[", ", ", "]"))}\n" +
        s"  first duck rows:  ${exp.take(3).map(_.mkString("[", ", ", "]"))}")
    } finally conn.close()
  }
}
