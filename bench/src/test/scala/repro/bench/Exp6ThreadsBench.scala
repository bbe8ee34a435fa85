package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.baseline.{PMHLSolution, PostMHLSolution}
import repro.graph.Datasets
import repro.exp.Experiments
import repro.throughput.{Params, QueueSim}

/** Exp 6 (Figure 15): update-time and throughput speedup when varying the
  * thread count p. The paper sweeps 1..160 on an 80-core box; we sweep
  * 1..16 on local cores — same plateau shape (sequential overlay phase +
  * bounded partition count, Amdahl).
  */
class Exp6ThreadsBench extends AnyFunSuite {

  private val ps = Seq(1, 2, 4, 8)

  test("Exp 6: thread-count sweep for PMHL and PostMHL") {
    val rows = collection.mutable.ArrayBuffer[String]()
    val tu = collection.mutable.Map[(String, String, Int), Double]()
    val tp = collection.mutable.Map[(String, String, Int), Double]()
    for (spec <- Seq(Datasets.FLA, Datasets.SC); algo <- Seq("PMHL", "PostMHL"); p <- ps) {
      val g = Experiments.graphOf(spec)
      val sol = algo match {
        case "PMHL"    => new PMHLSolution(g, spec.k, p)
        case "PostMHL" => new PostMHLSolution(g, spec.tau, spec.ke, p)
      }
      val profiles = Experiments.profile(sol, spec)
      val u = profiles.map(_.availableFrom).max * 1e3
      val l = QueueSim.maxThroughput(profiles, Params.deltaTFor(spec), Params.rqStarFor(spec))
      tu((spec.name, algo, p)) = u
      tp((spec.name, algo, p)) = l
      rows += f"${spec.name}%-9s $algo%-8s $p%3d ${u}%10.2f ${l}%16.1f"
    }
    println(Experiments.fmtTable("Exp 6: Effect of Thread Number p",
      f"${"Dataset"}%-9s ${"Algo"}%-8s ${"p"}%3s ${"t_u(ms)"}%10s ${"lambda*q"}%16s", rows.toSeq))
    // Shape: parallelism pays — the top of the sweep updates no slower
    // than p=1 and sustains positive throughput. p=1 throughput MAY be 0:
    // a single thread can fail to install the batch within δt (that is
    // the paper's very motivation for partition-parallel maintenance).
    for (spec <- Seq(Datasets.FLA, Datasets.SC); algo <- Seq("PMHL", "PostMHL")) {
      val u1 = tu((spec.name, algo, 1)); val u8 = tu((spec.name, algo, 8))
      assert(u8 <= u1 * 1.5, s"${spec.name}/$algo: t_u($u8 ms @p=8) vs $u1 ms @p=1")
      assert(ps.filter(_ >= 4).forall(p => tp((spec.name, algo, p)) > 0),
        s"${spec.name}/$algo: zero throughput at high thread count")
      assert(tp((spec.name, algo, 8)) >= 0.8 * tp((spec.name, algo, 1)),
        s"${spec.name}/$algo: throughput should not degrade from p=1 to p=8")
    }
  }
}
