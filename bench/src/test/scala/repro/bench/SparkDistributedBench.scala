package repro.bench

import repro.SparkSpec
import repro.graph.Datasets
import repro.exp.Experiments
import repro.spark.{DistributedLabels, LabelQuery, QueryRow}
import repro.core.sp.Dijkstra
import scala.util.Random

/** Distributed-dataflow bench (DESIGN.md §6): per-partition hub-label
  * construction fanned out over Spark tasks and bulk query answering as a
  * 2-hop label join — timed at dataset scale (not a paper table; it is
  * the repro-band's distributed realization of the PSP index).
  */
class SparkDistributedBench extends SparkSpec {

  test("distributed L* build + bulk 2-hop join query throughput") {
    val spec = Datasets.GD
    val g = Experiments.graphOf(spec)
    val t0 = System.nanoTime()
    val labels = DistributedLabels.buildLStar(spark, g, spec.k).cache()
    val nLabels = labels.count()
    val tBuild = (System.nanoTime() - t0) / 1e9

    import spark.implicits._
    val rnd = new Random(7)
    val nQ = 20000
    val qs = (0 until nQ).map(i => QueryRow(i.toLong, rnd.nextInt(g.n), rnd.nextInt(g.n)))
    val t1 = System.nanoTime()
    val answered = LabelQuery.answer(spark, qs.toDF(), labels).count()
    val tQuery = (System.nanoTime() - t1) / 1e9

    println(f"\n== Spark distributed PSP index (${spec.name}) ==")
    println(f"label rows: $nLabels%,d  build: ${tBuild}%.2f s")
    println(f"bulk queries: $nQ%,d answered: $answered%,d in ${tQuery}%.2f s " +
      f"(${nQ / tQuery}%,.0f queries/s)")

    assert(answered == nQ, "every query over a connected graph must be answered")
    // spot-check correctness of the distributed path at bench scale
    val sample = qs.take(25)
    val got = LabelQuery.answer(spark, sample.toDF(), labels)
      .collect().map(r => r.getLong(0) -> r.getInt(1)).toMap
    for (q <- sample)
      assert(got(q.qid) == Dijkstra.query(g, q.s, q.t), s"query (${q.s},${q.t})")
    labels.unpersist()
  }
}
