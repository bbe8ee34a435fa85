package repro.jobs

import repro.baseline.PostMHLSolution
import repro.graph.Datasets
import repro.exp.Experiments
import repro.throughput.{Params, QueueSim}

/** Exp 7: PostMHL k_e sweep. Args: [datasetName] [k_e ...]. */
object Exp7Ke {
  def main(args: Array[String]): Unit = {
    val spec = Datasets.byName(args.headOption.getOrElse("FLA-lite"))
    val kes = if (args.length > 1) args.drop(1).map(_.toInt).toSeq else Seq(8, 16, 32, 64)
    val rows = kes.map { ke =>
      val sol = new PostMHLSolution(Experiments.graphOf(spec), spec.tau, ke, Experiments.defaultThreads)
      val profiles = Experiments.profile(sol, spec)
      val tu = profiles.map(_.availableFrom).max * 1e3
      val tp = QueueSim.maxThroughput(profiles, Params.deltaTFor(spec), Params.rqStarFor(spec))
      f"k_e=$ke%-4d k=${sol.index.k}%-4d overlay=${sol.index.overlayCount}%-7d " +
        f"t_u=${tu}%10.2f ms  lambda*q=${tp}%14.1f"
    }
    println(Experiments.fmtTable(s"Exp 7: PostMHL k_e sweep on ${spec.name}", "", rows))
  }
}
