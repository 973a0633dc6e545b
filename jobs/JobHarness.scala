package repro.jobs

import java.sql.{Connection, DriverManager}
import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.{Catalog, Pipeline, SqlGen}
import repro.data.{NotebookData, TpchData}
import repro.frontend.Dsl
import repro.mini.MiniPandas

/** Shared plumbing for the spark-submit entrypoints in jobs/: a
  * SparkSession configured like the test harness, generated inputs at a
  * scale factor, and timed runners for every backend/alternative. */
object JobHarness {

  def session(appName: String): SparkSession = {
    val s = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(appName)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    s.sparkContext.setLogLevel("WARN")
    s
  }

  lazy val catalog: Catalog = Catalog(
    TpchData.catalog.schemas ++ NotebookData.catalog.schemas,
    TpchData.catalog.uniqueCols ++ NotebookData.catalog.uniqueCols,
    TpchData.catalog.matrixCols ++ NotebookData.catalog.matrixCols)

  def inputs(spark: SparkSession, sf: Double): Map[String, DataFrame] =
    TpchData.tables(spark, sf) ++ NotebookData.tables(spark, sf)

  def duckConn(inputs: Map[String, DataFrame]): Connection = {
    Class.forName("org.duckdb.DuckDBDriver")
    val c = DriverManager.getConnection("jdbc:duckdb:")
    inputs.foreach { case (n, df) => repro.Oracle.loadTable(c, n, df) }
    c
  }

  def timeMs(f: => Unit): Double = {
    val t0 = System.nanoTime(); f; (System.nanoTime() - t0) / 1e6
  }

  def bench(warmup: Int, iters: Int)(f: => Unit): Double = {
    (1 to warmup).foreach(_ => f)
    (1 to iters).map(_ => timeMs(f)).min
  }

  def runSpark(df: Dsl.Df, in: Map[String, DataFrame], spark: SparkSession, level: Int): Double =
    bench(1, 2) { Pipeline.toSpark(df, catalog, in, spark, level).collect() }

  def runDuck(df: Dsl.Df, conn: Connection, level: Int, threads: Int): Double = {
    conn.createStatement.execute(s"SET threads TO $threads")
    val sql = Pipeline.toSql(df, catalog, SqlGen.DuckDialect, level)
    bench(1, 2) { val rs = conn.createStatement.executeQuery(sql); while (rs.next()) {}; rs.close() }
  }

  def runPython(df: Dsl.Df, in: Map[String, DataFrame]): Double = {
    val mini = in.map { case (n, d) =>
      n -> MiniPandas.Table(d.columns.toVector, d.collect().toVector.map(_.toSeq.toArray)) }
    bench(1, 2) { MiniPandas.run(df, mini) }
  }
}
