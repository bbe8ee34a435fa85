package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.Datasets
import repro.exp.Experiments
import repro.throughput.{Params, QueueSim}

/** Exp 5 (Figure 14): throughput of PostMHL vs representative baselines
  * when varying update volume |U|, update interval δt, and QoS R*q.
  */
class Exp5ParamsBench extends AnyFunSuite {

  private val algos = Seq("BiDijkstra", "DCH", "DH2H", "N-CH-P", "PostMHL")

  test("Exp 5a: vary update volume |U|") {
    val spec = Datasets.FLA
    val rows = collection.mutable.ArrayBuffer[String]()
    val tp = collection.mutable.Map[(String, Double), Double]()
    for (algo <- algos; f <- Params.updateVolumeFactors) {
      val l = Experiments.throughput(spec, algo, uFactor = f)
      tp((algo, f)) = l
      rows += f"${spec.name}%-9s $algo%-11s ${f}%5.1f ${l}%16.1f"
    }
    println(Experiments.fmtTable("Exp 5a: Effect of Update Volume (factor of |V|/100)",
      f"${"Dataset"}%-9s ${"Algorithm"}%-11s ${"|U|x"}%5s ${"lambda*q (qps)"}%16s", rows.toSeq))
    // Shape: the PostMHL advantage grows with the update volume (heavier
    // batches choke DH2H's label maintenance); at the lightest volume all
    // hop-based indexes are fast and the ordering is within noise, so the
    // strict claim is asserted for the heavy volumes only.
    for (f <- Params.updateVolumeFactors) {
      val base = algos.filterNot(_ == "PostMHL").map(a => tp((a, f))).max
      val envelope = if (f >= 3.0) 1.0 else 0.3
      assert(tp(("PostMHL", f)) >= envelope * base,
        s"|U|x$f: PostMHL ${tp(("PostMHL", f))} below ${envelope}x best baseline $base")
    }
  }

  test("Exp 5b: vary update interval deltaT") {
    val spec = Datasets.SC
    val rows = collection.mutable.ArrayBuffer[String]()
    val last = collection.mutable.Map[(String, Double), Double]()
    for (algo <- algos) {
      val sol = Experiments.mkSolution(algo, spec)
      val profiles = Experiments.profile(sol, spec)
      for (dt <- Params.deltaTs) {
        val l = QueueSim.maxThroughput(profiles, dt, Params.defaultRqStar)
        last((algo, dt)) = l
        rows += f"${spec.name}%-9s $algo%-11s ${dt}%5.1f ${l}%16.1f"
      }
    }
    println(Experiments.fmtTable("Exp 5b: Effect of Update Interval deltaT (s)",
      f"${"Dataset"}%-9s ${"Algorithm"}%-11s ${"dt"}%5s ${"lambda*q (qps)"}%16s", rows.toSeq))
    // PostMHL throughput rises with a longer interval (more time on the
    // fastest stage); index-free BiDijkstra stays flat.
    assert(last(("PostMHL", Params.deltaTs.last)) >= last(("PostMHL", Params.deltaTs.head)),
      "PostMHL should not lose throughput with a longer interval")
    val bi = Params.deltaTs.map(dt => last(("BiDijkstra", dt)))
    assert(bi.max <= bi.min * 3 + 1, s"BiDijkstra should stay roughly flat, got $bi")
  }

  test("Exp 5c: vary QoS response time R*q") {
    val spec = Datasets.FLA
    val rows = collection.mutable.ArrayBuffer[String]()
    val tp = collection.mutable.Map[(String, Double), Double]()
    for (algo <- algos) {
      val sol = Experiments.mkSolution(algo, spec)
      val profiles = Experiments.profile(sol, spec)
      for (rq <- Params.rqStars) {
        val l = QueueSim.maxThroughput(profiles, Params.defaultDeltaT, rq)
        tp((algo, rq)) = l
        rows += f"${spec.name}%-9s $algo%-11s ${rq}%6.3f ${l}%16.1f"
      }
    }
    println(Experiments.fmtTable("Exp 5c: Effect of QoS R*q (s)",
      f"${"Dataset"}%-9s ${"Algorithm"}%-11s ${"R*q"}%6s ${"lambda*q (qps)"}%16s", rows.toSeq))
    for (rq <- Params.rqStars) {
      val base = algos.filterNot(_ == "PostMHL").map(a => tp((a, rq))).max
      assert(tp(("PostMHL", rq)) >= base, s"R*q=$rq: PostMHL below best baseline")
    }
    // throughput is monotone non-decreasing in QoS slack for every algorithm
    for (algo <- algos) {
      val seq = Params.rqStars.map(rq => tp((algo, rq)))
      assert(seq.zip(seq.tail).forall { case (a, b) => b >= a * 0.9 },
        s"$algo throughput not ~monotone in R*q: $seq")
    }
  }
}
