package repro.jobs

import repro.graph.Datasets
import repro.exp.Experiments

/** Exp 3: maximum average throughput λ*q per algorithm/dataset.
  * Args: [datasetName ...] (default: the four mid-size datasets).
  */
object Exp3Throughput {
  def main(args: Array[String]): Unit = {
    val names = if (args.nonEmpty) args.toSeq else Seq("NY-lite", "GD-lite", "FLA-lite", "SC-lite")
    val rows = for {
      name <- names
      spec = Datasets.byName(name)
      algo <- Seq("BiDijkstra", "DCH", "DH2H", "N-CH-P", "P-TD-P", "PMHL", "PostMHL")
    } yield f"$name%-9s $algo%-11s ${Experiments.throughput(spec, algo)}%16.1f"
    println(Experiments.fmtTable("Exp 3: Throughput (lambda*q, qps)",
      f"${"Dataset"}%-9s ${"Algorithm"}%-11s ${"lambda*q"}%16s", rows))
  }
}
