package repro.jobs

import repro.graph.Datasets
import repro.exp.Experiments
import repro.throughput.Params

/** Exp 4: QPS evolution across the update interval. Args: [datasetName]. */
object Exp4QpsEvolution {
  def main(args: Array[String]): Unit = {
    val spec = Datasets.byName(args.headOption.getOrElse("NY-lite"))
    val dt = Params.deltaTFor(spec)
    val rows = for (algo <- Seq("DCH", "DH2H", "PMHL", "PostMHL")) yield {
      val sol = Experiments.mkSolution(algo, spec)
      val profiles = Experiments.profile(sol, spec)
      val evo = Experiments.qpsEvolution(profiles, dt, points = 12)
      f"$algo%-11s " + evo.map { case (_, q) => f"${q}%9.0f" }.mkString(" ")
    }
    println(Experiments.fmtTable(s"Exp 4: QPS evolution on ${spec.name} (deltaT=$dt s)",
      "QPS of fastest available stage at 12 evenly spaced times", rows))
  }
}
