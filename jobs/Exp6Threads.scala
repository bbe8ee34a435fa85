package repro.jobs

import repro.baseline.{PMHLSolution, PostMHLSolution}
import repro.graph.Datasets
import repro.exp.Experiments
import repro.throughput.{Params, QueueSim}

/** Exp 6: thread-count sweep. Args: [datasetName] [p ...]. */
object Exp6Threads {
  def main(args: Array[String]): Unit = {
    val spec = Datasets.byName(args.headOption.getOrElse("FLA-lite"))
    val ps = if (args.length > 1) args.drop(1).map(_.toInt).toSeq else Seq(1, 2, 4, 8)
    val rows = for (algo <- Seq("PMHL", "PostMHL"); p <- ps) yield {
      val g = Experiments.graphOf(spec)
      val sol = if (algo == "PMHL") new PMHLSolution(g, spec.k, p)
                else new PostMHLSolution(g, spec.tau, spec.ke, p)
      val profiles = Experiments.profile(sol, spec)
      val tu = profiles.map(_.availableFrom).max * 1e3
      val tp = QueueSim.maxThroughput(profiles, Params.deltaTFor(spec), Params.rqStarFor(spec))
      f"$algo%-8s p=$p%-3d t_u=${tu}%10.2f ms  lambda*q=${tp}%14.1f"
    }
    println(Experiments.fmtTable(s"Exp 6: thread sweep on ${spec.name}", "", rows))
  }
}
