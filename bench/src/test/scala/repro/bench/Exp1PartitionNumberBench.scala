package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.baseline.PMHLSolution
import repro.graph.Datasets
import repro.exp.Experiments
import repro.throughput.{Params, QueueSim}

/** Exp 1 (Figure 10): effect of the partition number k on PMHL throughput
  * and update time. The paper finds both small and large k hurt (update
  * workload vs parallelization balance).
  */
class Exp1PartitionNumberBench extends AnyFunSuite {

  private val header =
    f"${"Dataset"}%-9s ${"k"}%4s ${"t_u(ms)"}%10s ${"lambda*q (qps)"}%16s"

  test("Exp 1: PMHL partition number sweep") {
    val ks = Seq(4, 8, 16, 32, 64)
    val rows = collection.mutable.ArrayBuffer[String]()
    val tps = collection.mutable.Map[(String, Int), Double]()
    for (spec <- Seq(Datasets.FLA, Datasets.SC); k <- ks) {
      val sol = new PMHLSolution(Experiments.graphOf(spec), k, Experiments.defaultThreads)
      val profiles = Experiments.profile(sol, spec)
      val tu = profiles.map(_.availableFrom).max * 1e3
      val tp = QueueSim.maxThroughput(profiles, Params.deltaTFor(spec), Params.rqStarFor(spec))
      tps((spec.name, k)) = tp
      rows += f"${spec.name}%-9s $k%4d ${tu}%10.2f ${tp}%16.1f"
    }
    println(Experiments.fmtTable("Exp 1: Effect of Partition Number k (PMHL)", header, rows.toSeq))
    // Shape: throughput positive everywhere and no catastrophic cliff at
    // the defaults used by Table I.
    for (spec <- Seq(Datasets.FLA, Datasets.SC)) {
      assert(ks.forall(k => tps((spec.name, k)) > 0))
      val atDefault = tps((spec.name, spec.k))
      val best = ks.map(k => tps((spec.name, k))).max
      assert(atDefault >= 0.2 * best,
        s"${spec.name}: default k=${spec.k} throughput $atDefault far from best $best")
    }
  }
}
