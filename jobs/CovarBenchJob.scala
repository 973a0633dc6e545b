package repro.jobs

import repro.core.{Pipeline, SparkGen, SqlGen}
import repro.data.NotebookData
import repro.mini.MiniPandas
import repro.workloads.CovarMicro

/** spark-submit entrypoint regenerating T7 (Fig. 9): covariance sweeps over
  * rows/cols/density in dense and sparse layouts.
  *
  * Usage: spark-submit --class repro.jobs.CovarBenchJob repro.jar [maxRows]
  */
object CovarBenchJob {
  def main(args: Array[String]): Unit = {
    val maxRows = args.headOption.map(_.toLong).getOrElse(200_000L)
    val spark = JobHarness.session("covar-bench")
    val sweeps =
      Seq(20_000L, 100_000L, maxRows).map(r => ("rows", r, 8, 1.0)) ++
      Seq(4, 8, 16).map(c => ("cols", 100_000L, c, 1.0)) ++
      Seq(0.001, 0.01, 0.1, 1.0).map(d => ("density", 100_000L, 8, d))
    for ((sweep, rows, cols, density) <- sweeps) {
      val cat = CovarMicro.catalogFor(cols)
      val dense = NotebookData.matrixDense(spark, rows, cols, density)
      val coo   = NotebookData.matrixCoo(spark, rows, cols, density)
      val duck  = JobHarness.duckConn(Map("m" -> dense, "m_coo" -> coo))
      val mini  = Map("m" -> MiniPandas.Table(dense.columns.toVector,
        dense.collect().toVector.map(_.toSeq.toArray)))
      def drain(sql: String): Unit = {
        val rs = duck.createStatement.executeQuery(sql); while (rs.next()) {}; rs.close()
      }
      val row = Seq(
        JobHarness.bench(1, 2) { MiniPandas.run(CovarMicro.denseDf(cols), mini) },
        JobHarness.bench(1, 2) { drain(Pipeline.toSql(CovarMicro.denseDf(cols), cat, SqlGen.DuckDialect, 4)) },
        JobHarness.bench(1, 2) { drain(SqlGen.programSql(CovarMicro.sparseProgram(), cat, SqlGen.DuckDialect)) },
        JobHarness.bench(1, 2) { Pipeline.toSpark(CovarMicro.denseDf(cols), cat, Map("m" -> dense), spark, 4).collect() },
        JobHarness.bench(1, 2) { SparkGen.compile(CovarMicro.sparseProgram(), Map("m_coo" -> coo), cat, spark).collect() })
      println(f"$sweep%-8s rows=$rows%-8d cols=$cols%-3d d=$density%-6.3f " +
        row.map(v => f"$v%10.1f").mkString(" "))
      duck.close()
    }
    spark.stop()
  }
}
