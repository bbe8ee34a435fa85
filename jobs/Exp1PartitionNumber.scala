package repro.jobs

import repro.baseline.PMHLSolution
import repro.graph.Datasets
import repro.exp.Experiments
import repro.throughput.{Params, QueueSim}

/** Exp 1: PMHL partition-number sweep. Args: [datasetName] [k ...]. */
object Exp1PartitionNumber {
  def main(args: Array[String]): Unit = {
    val spec = Datasets.byName(args.headOption.getOrElse("FLA-lite"))
    val ks = if (args.length > 1) args.drop(1).map(_.toInt).toSeq else Seq(4, 8, 16, 32, 64)
    val rows = ks.map { k =>
      val sol = new PMHLSolution(Experiments.graphOf(spec), k, Experiments.defaultThreads)
      val profiles = Experiments.profile(sol, spec)
      val tu = profiles.map(_.availableFrom).max * 1e3
      val tp = QueueSim.maxThroughput(profiles, Params.deltaTFor(spec), Params.rqStarFor(spec))
      f"k=$k%-4d t_u=${tu}%10.2f ms  lambda*q=${tp}%14.1f"
    }
    println(Experiments.fmtTable(s"Exp 1: PMHL k sweep on ${spec.name}", "", rows))
  }
}
