package repro.jobs

import repro.workloads.{Hybrid, Notebooks}

/** spark-submit entrypoint regenerating T3/T4 (Figs. 5–6): the hybrid
  * data-science workloads across all alternatives.
  *
  * Usage: spark-submit --class repro.jobs.WorkloadBenchJob repro.jar [sf]
  */
object WorkloadBenchJob {
  def main(args: Array[String]): Unit = {
    val sf = args.headOption.map(_.toDouble).getOrElse(0.1)
    val spark = JobHarness.session("workload-bench")
    val in = JobHarness.inputs(spark, sf)
    val duck = JobHarness.duckConn(in)
    for (w <- Notebooks.all ++ Hybrid.all) {
      val d = w.build(JobHarness.catalog)
      val row = Seq(
        JobHarness.runPython(d, in),
        JobHarness.runDuck(d, duck, 0, 1), JobHarness.runDuck(d, duck, 4, 1),
        JobHarness.runDuck(d, duck, 0, 4), JobHarness.runDuck(d, duck, 4, 4),
        JobHarness.runSpark(d, in, spark, 0), JobHarness.runSpark(d, in, spark, 4))
      println(f"${w.name}%-22s " + row.map(v => f"$v%10.1f").mkString(" "))
    }
    spark.stop()
  }
}
