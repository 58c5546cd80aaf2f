package repro.jobs

import repro.exp.{CabExperiment, Reports}

/** Shared driver for the §6 CAB-sweep jobs: run all four strategies once,
  * print the requested views. `args(0)` may scale the experiment
  * ("small" ≈ smoke run, default = bench scale).
  */
object CabJobs {
  def params(args: Array[String]): CabExperiment.Params =
    if (args.headOption.contains("small"))
      CabExperiment.Params(nDbs = 2, hours = 2, months = 3,
        appendSf = 0.0005, appendFiles = 3, initialSf = 0.001,
        initialLineitemFiles = 3, initialOrdersFiles = 4)
    else
      CabExperiment.Params(nDbs = 6, hours = 5, months = 8,
        appendSf = 0.002, appendFiles = 6, initialSf = 0.004,
        initialLineitemFiles = 6, initialOrdersFiles = 12)

  def run(name: String, args: Array[String])(view: Vector[CabExperiment.StrategyResult] => String): Unit = {
    val spark = JobSession.create(name)
    try {
      val p = params(args)
      val results = CabExperiment.runAll(spark, p, CabExperiment.paperStrategies(p))
      println(view(results))
    } finally spark.stop()
  }
}

/** Table 1: write-write conflicts per execution hour. */
object Table1Conflicts {
  def main(args: Array[String]): Unit =
    CabJobs.run("table1-conflicts", args)(Reports.table1)
}

/** Figure 6: file count over time per strategy. */
object Fig6FileCount {
  def main(args: Array[String]): Unit =
    CabJobs.run("fig6-filecount", args)(Reports.fig6)
}

/** Figure 7: mean GBHr per compaction application. */
object Fig7ComputeCost {
  def main(args: Array[String]): Unit =
    CabJobs.run("fig7-computecost", args)(Reports.fig7)
}

/** Figure 8: query latency per hour. */
object Fig8QueryLatency {
  def main(args: Array[String]): Unit =
    CabJobs.run("fig8-querylatency", args)(Reports.fig8)
}
