package repro.workloads

import java.sql.Connection
import org.apache.spark.sql.DataFrame
import repro.{Oracle, SparkSpec}
import repro.core.{Pipeline, SqlGen}
import repro.data.NotebookData
import repro.mini.MiniPandas

/** Shared SF=0.01 inputs for the notebook + hybrid workloads. */
object NbData {
  val SF = 0.01
  lazy val spark = repro.SparkSpec.shared
  lazy val inputs: Map[String, DataFrame] = NotebookData.tables(spark, SF)
  lazy val duck: Connection = {
    val c = Oracle.connect()
    inputs.foreach { case (n, df) => Oracle.loadTable(c, n, df) }
    c
  }
  lazy val mini: Map[String, MiniPandas.Table] = inputs.map { case (n, df) =>
    n -> MiniPandas.Table(df.columns.toVector, df.collect().toVector.map(_.toSeq.toArray))
  }
}

/** Oracle-checked correctness of the data-science notebook workloads
  * (Crime Index, Birth Analysis, N3, N9) and the hybrid matrix experiments
  * across all engines and optimization levels. */
class NotebookSpec extends SparkSpec {
  private val cat = NotebookData.catalog

  for (w <- Notebooks.all ++ Hybrid.all) {
    test(s"${w.name}: SparkGen O4 matches reference SQL") {
      val df = Pipeline.toSpark(w.build(cat), cat, NbData.inputs, spark, level = 4)
      Oracle.assertEquivalentOn(NbData.duck, df, w.refSql)
    }

    test(s"${w.name}: SparkGen O0 (Grizzly-simulated) matches reference SQL") {
      val df = Pipeline.toSpark(w.build(cat), cat, NbData.inputs, spark, level = 0)
      Oracle.assertEquivalentOn(NbData.duck, df, w.refSql)
    }

    test(s"${w.name}: generated DuckDB SQL (O4) matches reference SQL") {
      val sql = Pipeline.toSql(w.build(cat), cat, SqlGen.DuckDialect, level = 4)
      Oracle.assertSqlEquivalent(NbData.duck, sql, w.refSql)
    }

    test(s"${w.name}: generated DuckDB SQL (O0) matches reference SQL") {
      val sql = Pipeline.toSql(w.build(cat), cat, SqlGen.DuckDialect, level = 0)
      Oracle.assertSqlEquivalent(NbData.duck, sql, w.refSql)
    }

    test(s"${w.name}: generated Spark SQL (O4) matches reference SQL") {
      val df = Pipeline.toSparkSql(w.build(cat), cat, NbData.inputs, spark, level = 4)
      Oracle.assertEquivalentOn(NbData.duck, df, w.refSql)
    }

    test(s"${w.name}: MiniPandas baseline matches reference SQL") {
      val t = MiniPandas.run(w.build(cat), NbData.mini)
      Oracle.assertRowsEquivalentOn(NbData.duck, t.schema, t.rows.map(_.toSeq), w.refSql)
    }
  }
}
