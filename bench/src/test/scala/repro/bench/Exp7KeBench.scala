package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.baseline.PostMHLSolution
import repro.graph.Datasets
import repro.exp.Experiments
import repro.throughput.{Params, QueueSim}

/** Exp 7 (Figure 17, appendix): effect of the expected partition number
  * k_e on PostMHL throughput and update time.
  */
class Exp7KeBench extends AnyFunSuite {

  test("Exp 7: PostMHL k_e sweep") {
    val kes = Seq(8, 16, 32, 64)
    val rows = collection.mutable.ArrayBuffer[String]()
    val tps = collection.mutable.Map[(String, Int), Double]()
    for (spec <- Seq(Datasets.FLA, Datasets.EC); ke <- kes) {
      val sol = new PostMHLSolution(Experiments.graphOf(spec), spec.tau, ke,
        Experiments.defaultThreads)
      val profiles = Experiments.profile(sol, spec)
      val tu = profiles.map(_.availableFrom).max * 1e3
      val tp = QueueSim.maxThroughput(profiles, Params.deltaTFor(spec), Params.rqStarFor(spec))
      tps((spec.name, ke)) = tp
      rows += f"${spec.name}%-9s $ke%4d k=${sol.index.k}%4d ov=${sol.index.overlayCount}%6d ${tu}%10.2f ${tp}%16.1f"
    }
    println(Experiments.fmtTable("Exp 7: Effect of k_e (PostMHL)",
      f"${"Dataset"}%-9s ${"k_e"}%4s ${"k"}%6s ${"ov"}%9s ${"t_u(ms)"}%10s ${"lambda*q"}%16s",
      rows.toSeq))
    for (spec <- Seq(Datasets.FLA, Datasets.EC)) {
      assert(kes.forall(ke => tps((spec.name, ke)) > 0))
      val best = kes.map(ke => tps((spec.name, ke))).max
      assert(tps((spec.name, 32)) >= 0.2 * best,
        s"${spec.name}: k_e=32 unexpectedly far from best")
    }
  }
}
