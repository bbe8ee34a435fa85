package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.Datasets
import repro.exp.Experiments
import repro.throughput.Params

/** Exp 4 (Figure 13): evolution of QPS (1/t_q of the fastest available
  * stage) across the update interval on NY and FLA — the visual
  * explanation of the multi-stage scheme.
  */
class Exp4QpsEvolutionBench extends AnyFunSuite {

  test("Exp 4: QPS evolution during the update interval") {
    val algos = Seq("DCH", "DH2H", "PMHL", "PostMHL")
    for (spec <- Seq(Datasets.NY, Datasets.FLA)) {
      val dt = Params.deltaTFor(spec)
      val rows = collection.mutable.ArrayBuffer[String]()
      val finalQps = collection.mutable.Map[String, Double]()
      val meanQps = collection.mutable.Map[String, Double]()
      val fastAvail = collection.mutable.Map[String, Double]()
      for (algo <- algos) {
        val sol = Experiments.mkSolution(algo, spec)
        val profiles = Experiments.profile(sol, spec)
        val evo = Experiments.qpsEvolution(profiles, dt, points = 12)
        finalQps(algo) = evo.last._2
        meanQps(algo) = evo.map(_._2).sum / evo.size
        fastAvail(algo) = profiles.map(_.availableFrom).max
        rows += f"$algo%-11s " + evo.map { case (x, q) => f"${q}%9.0f" }.mkString(" ")
        if (algo == algos.head) {
          rows.insert(0, f"${"t(s)"}%-11s " + evo.map { case (x, _) => f"${x}%9.2f" }.mkString(" "))
        }
      }
      println(Experiments.fmtTable(s"Exp 4: QPS evolution on ${spec.name} (deltaT=$dt)",
        "rows: QPS of fastest available stage at each time point", rows.toSeq))
      // Shape claims (robust versions of Figure 13): hop-based stages end
      // far above DCH; PostMHL reaches its fastest stage no later than
      // DH2H reaches H2H (faster maintenance is the paper's key claim —
      // final-stage micro-timings of identical H2H queries are noise).
      assert(meanQps("PostMHL") > meanQps("DCH"),
        s"${spec.name}: PostMHL mean QPS should beat DCH")
      assert(finalQps("PostMHL") > finalQps("DCH") * 2,
        s"${spec.name}: final-stage PostMHL QPS should dwarf DCH")
      assert(fastAvail("PostMHL") <= fastAvail("DH2H") * 1.5,
        s"${spec.name}: PostMHL full index should be ready no (much) later than DH2H")
    }
  }
}
