package repro.jobs

import repro.graph.Datasets
import repro.exp.Experiments

/** Exp 2: index performance (t_c, |L|, t_q, t_u) per algorithm/dataset.
  * Args: [datasetName ...] (default NY-lite FLA-lite EC-lite).
  */
object Exp2IndexPerf {
  def main(args: Array[String]): Unit = {
    val names = if (args.nonEmpty) args.toSeq else Seq("NY-lite", "FLA-lite", "EC-lite")
    val rows = for {
      name <- names
      spec = Datasets.byName(name)
      algo <- Seq("BiDijkstra", "DCH", "DH2H", "MHL", "N-CH-P", "P-TD-P", "PMHL", "PostMHL") ++
        (if (spec.nVertices < 12000) Seq("TOAIN") else Seq.empty)
    } yield Experiments.indexPerf(spec, algo).row(name)
    println(Experiments.fmtTable("Exp 2: Index Performance",
      f"${"Dataset"}%-9s ${"Algorithm"}%-11s ${"t_c(s)"}%9s ${"|L|(entries)"}%13s ${"t_q(us)"}%11s ${"t_u(ms)"}%11s",
      rows))
  }
}
