package repro.jobs

import repro.baseline.PostMHLSolution
import repro.graph.Datasets
import repro.exp.Experiments
import repro.throughput.{Params, QueueSim}

/** Exp 8: PostMHL bandwidth (tau) sweep. Args: [datasetName] [tau ...]. */
object Exp8Bandwidth {
  def main(args: Array[String]): Unit = {
    val spec = Datasets.byName(args.headOption.getOrElse("NY-lite"))
    val taus = if (args.length > 1) args.drop(1).map(_.toInt).toSeq else Seq(20, 30, 40, 60)
    val rows = taus.map { tau =>
      val sol = new PostMHLSolution(Experiments.graphOf(spec), tau, spec.ke, Experiments.defaultThreads)
      val profiles = Experiments.profile(sol, spec)
      val tqPost = profiles.find(_.label == "PostB-H2H").map(_.mean * 1e6).getOrElse(Double.NaN)
      val tu = profiles.map(_.availableFrom).max * 1e3
      val tp = QueueSim.maxThroughput(profiles, Params.deltaTFor(spec), Params.rqStarFor(spec))
      f"tau=$tau%-4d overlay=${sol.index.overlayCount}%-7d tq(Q3)=${tqPost}%9.2f us " +
        f"t_u=${tu}%10.2f ms  lambda*q=${tp}%14.1f"
    }
    println(Experiments.fmtTable(s"Exp 8: PostMHL tau sweep on ${spec.name}", "", rows))
  }
}
