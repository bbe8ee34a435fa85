package repro.baseline

import repro.graph.RoadGraph
import repro.core.pmhl.PMHL
import repro.core.postmhl.PostMHL

/** PMHL (§V) as a Solution: five query stages released across U-Stages 1-5. */
final class PMHLSolution(g0: RoadGraph, k: Int, threads: Int) extends Solution {
  val graph: RoadGraph = g0.copyWeights()
  val name = "PMHL"
  val index = new PMHL(graph, k, threads)
  val buildSeconds: Double = {
    val t0 = System.nanoTime()
    index.build()
    (System.nanoTime() - t0) / 1e9
  }
  def indexEntries: Long = index.indexEntries
  def applyBatch(batch: Seq[(Int, Int, Int)]): IndexedSeq[QueryStage] = {
    val st = index.applyUpdateBatch(batch)
    IndexedSeq(
      QueryStage(st.t(0), "BiDij", index.queryBiDijkstra),
      QueryStage(st.t(1), "PCH", index.queryPCH),
      QueryStage(st.t(2), "NoB-H2H", index.queryNoBoundary),
      QueryStage(st.t(3), "PostB-H2H", index.queryPostBoundary),
      QueryStage(st.t(4), "CrossB-H2H", index.queryCrossBoundary),
    )
  }
  def bestQuery(s: Int, t: Int): Int = index.queryCrossBoundary(s, t)
}

/** P-TD-P [35]: the query-oriented post-boundary PSP baseline — exactly
  * PMHL without the cross-boundary strategy (its best query concatenates
  * partition and overlay labels for cross-partition pairs).
  */
final class PTDPSolution(g0: RoadGraph, k: Int, threads: Int) extends Solution {
  val graph: RoadGraph = g0.copyWeights()
  val name = "P-TD-P"
  val index = new PMHL(graph, k, threads, withCross = false)
  val buildSeconds: Double = {
    val t0 = System.nanoTime()
    index.build()
    (System.nanoTime() - t0) / 1e9
  }
  def indexEntries: Long = index.indexEntries
  def applyBatch(batch: Seq[(Int, Int, Int)]): IndexedSeq[QueryStage] = {
    val st = index.applyUpdateBatch(batch)
    IndexedSeq(
      QueryStage(st.t(0), "BiDij", index.queryBiDijkstra),
      QueryStage(st.t(1), "PCH", index.queryPCH),
      QueryStage(st.t(2), "NoB-H2H", index.queryNoBoundary),
      QueryStage(st.t(3), "PostB-H2H", index.queryPostBoundary),
    )
  }
  def bestQuery(s: Int, t: Int): Int = index.queryPostBoundary(s, t)
}

/** PostMHL (§VI) as a Solution: four query stages (Figure 9). */
final class PostMHLSolution(g0: RoadGraph, tau: Int, ke: Int, threads: Int,
                            betaL: Double = 0.1, betaU: Double = 2.0) extends Solution {
  val graph: RoadGraph = g0.copyWeights()
  val name = "PostMHL"
  private val t0 = System.nanoTime()
  val index = new PostMHL(graph, tau, ke, betaL, betaU, threads)
  val buildSeconds: Double = (System.nanoTime() - t0) / 1e9
  def indexEntries: Long = index.indexEntries
  def applyBatch(batch: Seq[(Int, Int, Int)]): IndexedSeq[QueryStage] = {
    val st = index.applyUpdateBatch(batch)
    IndexedSeq(
      QueryStage(st.t(0), "BiDij", index.queryBiDijkstra),
      QueryStage(st.t(1), "PCH", index.queryPCH),
      QueryStage(st.t(3), "PostB-H2H", index.queryPost),
      QueryStage(st.t(4), "CrossB-H2H", index.queryFull),
    )
  }
  def bestQuery(s: Int, t: Int): Int = index.queryFull(s, t)
}
