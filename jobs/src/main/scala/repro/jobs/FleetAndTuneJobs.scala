package repro.jobs

import repro.exp.{FleetExperiments, Reports}
import repro.tune.{Tuner, WorkloadModel}

/** Figure 9: auto-tuning of compaction triggers (no Spark needed — the
  * workloads run on the calibrated analytic model; see DESIGN.md).
  */
object Fig9AutoTune {
  def main(args: Array[String]): Unit = {
    val tuner = new Tuner(seed = 2024L)
    val iters = args.headOption.map(_.toInt).getOrElse(25)
    println(Reports.fig9("wp1/smallFileCount", "paper: up to 2x gain",
      tuner.optimize(WorkloadModel.wp1, "smallFileCount", iters)))
    println(Reports.fig9("tpch/smallFileCount", "paper: default best",
      tuner.optimize(WorkloadModel.tpch, "smallFileCount", iters)))
    println(Reports.fig9("wp1/fileEntropy", "paper: comparable to count trigger",
      tuner.optimize(WorkloadModel.wp1, "fileEntropy", iters)))
    println(Reports.fig9("wp3/smallFileCount", "paper: consistent benefits",
      tuner.optimize(WorkloadModel.wp3, "smallFileCount", iters)))
  }
}

/** Figure 10: fleet-scale AutoComp behavior (pure simulation, no Spark). */
object Fig10Fleet {
  def main(args: Array[String]): Unit = {
    println(Reports.fig10a(FleetExperiments.runFig10a()))
    println(Reports.fig10b(FleetExperiments.runFig10b()))
    println(Reports.fig10c(FleetExperiments.runFig10c()))
  }
}

/** Figure 11: workload & HDFS impact (pure simulation, no Spark). */
object Fig11WorkloadImpact {
  def main(args: Array[String]): Unit = {
    println(Reports.fig11a(FleetExperiments.runFig11a()))
    println(Reports.fig11b(FleetExperiments.runFig11b(), daysPerMonth = 30))
  }
}
