package repro.jobs

import repro.graph.Datasets
import repro.exp.Experiments
import repro.throughput.Params

/** Table I + Table II. Run: spark-submit --class repro.jobs.Table1Datasets. */
object Table1Datasets {
  def main(args: Array[String]): Unit = {
    val rows = Datasets.all.map { spec =>
      val g = Experiments.graphOf(spec)
      f"${spec.name}%-9s ${spec.paperName}%-14s ${spec.paperV}%10d ${g.n}%8d ${g.m}%8d ${spec.k}%4d ${spec.ke}%5d ${spec.tau}%5d"
    }
    println(Experiments.fmtTable("Table I: Datasets",
      f"${"Name"}%-9s ${"Paper dataset"}%-14s ${"paper|V|"}%10s ${"|V|"}%8s ${"|E|"}%8s ${"k"}%4s ${"k_e"}%5s ${"tau"}%5s",
      rows))
    println(s"Table II: |U| factors=${Params.updateVolumeFactors.mkString(",")} " +
      s"deltaT=${Params.deltaTs.mkString(",")} R*q=${Params.rqStars.mkString(",")}")
  }
}
