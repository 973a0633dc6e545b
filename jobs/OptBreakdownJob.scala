package repro.jobs

import repro.workloads.{Hybrid, Notebooks, Tpch}

/** spark-submit entrypoint regenerating T8 (Fig. 10): the cumulative
  * optimization breakdown O0..O4 on representative workloads.
  *
  * Usage: spark-submit --class repro.jobs.OptBreakdownJob repro.jar [sf]
  */
object OptBreakdownJob {
  def main(args: Array[String]): Unit = {
    val sf = args.headOption.map(_.toDouble).getOrElse(0.1)
    val spark = JobHarness.session("opt-breakdown")
    val in = JobHarness.inputs(spark, sf)
    val duck = JobHarness.duckConn(in)
    val targets =
      Seq("Q3", "Q9").map(q => q -> Tpch.byId(q.drop(1).toInt).build(JobHarness.catalog)) ++
      Seq(Notebooks.crimeIndex, Notebooks.n3, Hybrid.hybridCovar, Hybrid.hybridMatmul)
        .map(w => w.name -> w.build(JobHarness.catalog))
    for ((name, d) <- targets) {
      val duckRow  = (0 to 4).map(l => JobHarness.runDuck(d, duck, l, 4))
      val sparkRow = (0 to 4).map(l => JobHarness.runSpark(d, in, spark, l))
      println(f"$name%-16s duckdb " + duckRow.map(v => f"$v%10.1f").mkString(" "))
      println(f"$name%-16s spark  " + sparkRow.map(v => f"$v%10.1f").mkString(" "))
    }
    spark.stop()
  }
}
