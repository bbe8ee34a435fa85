package repro.jobs

import repro.graph.Datasets
import repro.exp.Experiments
import repro.throughput.{Params, QueueSim}

/** Exp 5: throughput sweeps over |U|, deltaT, R*q. Args: [datasetName]. */
object Exp5Params {
  def main(args: Array[String]): Unit = {
    val spec = Datasets.byName(args.headOption.getOrElse("FLA-lite"))
    val algos = Seq("BiDijkstra", "DCH", "DH2H", "N-CH-P", "PostMHL")
    val rowsU = for (algo <- algos; f <- Params.updateVolumeFactors)
      yield f"$algo%-11s |U|x$f%-4s ${Experiments.throughput(spec, algo, uFactor = f)}%14.1f"
    println(Experiments.fmtTable(s"Exp 5a: |U| sweep on ${spec.name}", "", rowsU))
    for (algo <- algos) {
      val profiles = Experiments.profile(Experiments.mkSolution(algo, spec), spec)
      val rowsD = Params.deltaTs.map(dt =>
        f"dt=$dt%-5s ${QueueSim.maxThroughput(profiles, dt, Params.defaultRqStar)}%14.1f")
      val rowsR = Params.rqStars.map(rq =>
        f"R*q=$rq%-6s ${QueueSim.maxThroughput(profiles, Params.defaultDeltaT, rq)}%14.1f")
      println(Experiments.fmtTable(s"Exp 5b/5c: $algo on ${spec.name}", "", rowsD ++ rowsR))
    }
  }
}
