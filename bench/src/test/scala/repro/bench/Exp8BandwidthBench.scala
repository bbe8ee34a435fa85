package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.baseline.PostMHLSolution
import repro.graph.Datasets
import repro.exp.Experiments
import repro.throughput.{Params, QueueSim}

/** Exp 8 (Figure 18, appendix): effect of the bandwidth τ on PostMHL —
  * overlay vertex number, post-boundary (Q-Stage 3) query time, update
  * time, and throughput. Larger τ shrinks the overlay but slows the
  * post-boundary query; small τ bloats the (sequentially maintained)
  * overlay and hurts update time and throughput.
  */
class Exp8BandwidthBench extends AnyFunSuite {

  test("Exp 8: PostMHL bandwidth sweep") {
    val taus = Seq(20, 30, 40, 60)
    val rows = collection.mutable.ArrayBuffer[String]()
    val ov = collection.mutable.Map[(String, Int), Int]()
    val tps = collection.mutable.Map[(String, Int), Double]()
    for (spec <- Seq(Datasets.NY, Datasets.FLA); tau <- taus) {
      val sol = new PostMHLSolution(Experiments.graphOf(spec), tau, spec.ke,
        Experiments.defaultThreads)
      val profiles = Experiments.profile(sol, spec)
      val postStage = profiles.find(_.label == "PostB-H2H")
      val tqPost = postStage.map(_.mean * 1e6).getOrElse(Double.NaN)
      val tu = profiles.map(_.availableFrom).max * 1e3
      val tp = QueueSim.maxThroughput(profiles, Params.deltaTFor(spec), Params.rqStarFor(spec))
      ov((spec.name, tau)) = sol.index.overlayCount
      tps((spec.name, tau)) = tp
      rows += f"${spec.name}%-9s $tau%4d k=${sol.index.k}%4d ov=${sol.index.overlayCount}%6d " +
        f"tqPost=${tqPost}%9.2fus ${tu}%10.2fms ${tp}%14.1f"
    }
    println(Experiments.fmtTable("Exp 8: Effect of bandwidth tau (PostMHL)",
      f"${"Dataset"}%-9s ${"tau"}%4s ${"k"}%6s ${"overlay"}%9s ${"tq(Q3)"}%11s ${"t_u"}%12s ${"lambda*q"}%14s",
      rows.toSeq))
    for (spec <- Seq(Datasets.NY, Datasets.FLA)) {
      // larger bandwidth -> smaller overlay (paper's Fig 18a observation)
      assert(ov((spec.name, taus.head)) >= ov((spec.name, taus.last)),
        s"${spec.name}: overlay should shrink with tau")
      assert(taus.forall(tau => tps((spec.name, tau)) > 0))
    }
  }
}
