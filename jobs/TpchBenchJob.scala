package repro.jobs

import repro.workloads.Tpch

/** spark-submit entrypoint regenerating T1/T2 (Figs. 3–4): all 22 TPC-H
  * queries across Python-sim / Grizzly-sim / PyTond on DuckDB (1 & 4
  * threads) and Spark.
  *
  * Usage: spark-submit --class repro.jobs.TpchBenchJob repro.jar [sf]
  */
object TpchBenchJob {
  def main(args: Array[String]): Unit = {
    val sf = args.headOption.map(_.toDouble).getOrElse(0.1)
    val spark = JobHarness.session("tpch-bench")
    val in = JobHarness.inputs(spark, sf)
    val duck = JobHarness.duckConn(in)
    println(f"${"query"}%-6s ${"python"}%10s ${"grizDk1"}%10s ${"pytDk1"}%10s " +
      f"${"grizDk4"}%10s ${"pytDk4"}%10s ${"grizSp"}%10s ${"pytSp"}%10s")
    for (q <- Tpch.all) {
      val d = q.build(JobHarness.catalog)
      val row = Seq(
        JobHarness.runPython(d, in),
        JobHarness.runDuck(d, duck, 0, 1), JobHarness.runDuck(d, duck, 4, 1),
        JobHarness.runDuck(d, duck, 0, 4), JobHarness.runDuck(d, duck, 4, 4),
        JobHarness.runSpark(d, in, spark, 0), JobHarness.runSpark(d, in, spark, 4))
      println(f"Q${q.id}%-5d " + row.map(v => f"$v%10.1f").mkString(" "))
    }
    spark.stop()
  }
}
