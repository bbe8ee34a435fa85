package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.{Datasets, GridGen}
import repro.exp.Experiments
import repro.throughput.Params

/** Table I (dataset statistics) and Table II (parameters) of the paper,
  * instantiated for the synthetic "-lite" datasets (DESIGN.md §2).
  */
class Table1DatasetsBench extends AnyFunSuite {

  test("Table I: datasets") {
    val rows = Datasets.all.map { spec =>
      val g = Experiments.graphOf(spec)
      assert(GridGen.isConnected(g), spec.name)
      f"${spec.name}%-9s ${spec.paperName}%-14s ${spec.paperV}%10d ${g.n}%8d ${g.m}%8d " +
        f"${spec.k}%4d ${spec.ke}%5d ${spec.tau}%5d"
    }
    println(Experiments.fmtTable("Table I: Real-world Datasets (synthetic -lite analogs)",
      f"${"Name"}%-9s ${"Paper dataset"}%-14s ${"paper|V|"}%10s ${"|V|"}%8s ${"|E|"}%8s " +
      f"${"k"}%4s ${"k_e"}%5s ${"tau"}%5s", rows))
    // scale ratio roughly uniform (1/100; 1/400 for CTR/USA)
    for (spec <- Datasets.all) {
      val ratio = spec.paperV.toDouble / spec.nVertices
      assert(ratio > 50 && ratio < 600, s"${spec.name} scale ratio $ratio")
    }
  }

  test("Table II: parameters") {
    val rows = Seq(
      f"${"Update Volume factor (vs |V|/100)"}%-38s ${Params.updateVolumeFactors.mkString(", ")} (paper: 500, 1000, 3000, 5000)",
      f"${"Update Interval deltaT (s)"}%-38s ${Params.deltaTs.mkString(", ")} (paper: 60, 120, 300, 600)",
      f"${"Query Response QoS R*q (s)"}%-38s ${Params.rqStars.mkString(", ")} (paper: 0.5, 1.0, 1.5, 2.0)",
    )
    println(Experiments.fmtTable("Table II: Parameters (defaults bold in paper: 1000/120/1.0)",
      f"${"Parameter"}%-38s Values", rows))
    assert(Params.deltaTs.contains(Params.defaultDeltaT))
    assert(Params.rqStars.contains(Params.defaultRqStar))
  }
}
