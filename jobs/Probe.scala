package repro.jobs

import repro.graph.Datasets
import repro.core.td.MDE
import repro.core.h2h.H2HIndex

/** Scratch probe: PostMHL per-stage update times vs DH2H on one dataset.
  * Run: sbt "runMain repro.jobs.ProbeStages [dataset]".
  */
object ProbeStages {
  def main(args: Array[String]): Unit = {
    val spec = Datasets.byName(args.headOption.getOrElse("NY-lite"))
    val threads = if (args.length > 1) args(1).toInt else 8
    val g = spec.build()
    val p = new repro.core.postmhl.PostMHL(g.copyWeights(), spec.tau, spec.ke, 0.1, 2.0, threads)
    println(s"k=${p.k} overlay=${p.overlayCount} height=${p.td.height}")
    val dh2h = new repro.baseline.DH2HSolution(g)
    for (r <- 1 to 4) {
      val batch = Datasets.updateBatch(p.g, Datasets.defaultUpdateVolume(spec), 7000 + r)
      val st = p.applyUpdateBatch(batch)
      val stagesD = dh2h.applyBatch(batch)
      println(f"round $r postmhl stages=${st} dh2h=${stagesD.map(_.availableFrom).mkString(",")}")
    }
  }
}

/** Scratch probe: per-dataset MDE/H2H build cost, used to scope bench
  * sizes (not an experiment table). Run: sbt "runMain repro.jobs.Probe".
  */
object Probe {
  def main(args: Array[String]): Unit = {
    val names = if (args.nonEmpty) args.toSeq else Seq("NY-lite", "GD-lite", "FLA-lite", "SC-lite", "EC-lite", "W-lite")
    for (name <- names) {
      val spec = Datasets.byName(name)
      val g = spec.build()
      val t0 = System.nanoTime()
      val td = MDE.decompose(g.n, g.undirectedEdges)
      val t1 = System.nanoTime()
      val h = new H2HIndex(td); h.build()
      val t2 = System.nanoTime()
      println(f"$name%-9s n=${g.n}%7d m=${g.m}%7d mde=${(t1 - t0) / 1e9}%7.2fs h2h=${(t2 - t1) / 1e9}%7.2fs " +
        f"height=${td.height}%5d width=${td.maxBagSize}%4d labels=${h.labelEntries}%12d")
    }
  }
}
