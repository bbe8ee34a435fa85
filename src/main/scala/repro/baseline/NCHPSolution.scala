package repro.baseline

import repro.graph.RoadGraph
import repro.partition.SpatialPartitioner
import repro.core.td.{MDE, ShortcutUpdater, TD}
import repro.core.h2h.{CHQuery, UpwardGraph}
import repro.core.sp.BiDijkstra
import repro.util.Parallel
import scala.collection.mutable

/** N-CH-P [35]: the update-oriented no-boundary PSP index — partitioned
  * CH shortcut arrays plus an overlay CH, queried by the PCH upward
  * search. No distance labels at all, so maintenance is only the
  * (partition-parallel) shortcut phase.
  */
final class NCHPSolution(g0: RoadGraph, k: Int, threads: Int) extends Solution {
  val graph: RoadGraph = g0.copyWeights()
  val name = "N-CH-P"
  private val n = graph.n

  private var part: Array[Int] = _
  private var boundary: Array[Boolean] = _
  private var tdPart: Array[TD] = _
  private var updPart: Array[ShortcutUpdater] = _
  private var tdOv: TD = _
  private var updOv: ShortcutUpdater = _
  private var pch: CHQuery = _

  val buildSeconds: Double = {
    val t0 = System.nanoTime()
    val pr = SpatialPartitioner.partition(graph, k)
    part = pr.part; boundary = pr.boundary
    val intra = Array.tabulate(k)(SpatialPartitioner.intraEdges(graph, pr, _))
    val ovParts = Parallel.map((0 until k).toSeq, threads) { i =>
      val contract = new Array[Boolean](n)
      for (v <- 0 until n) contract(v) = part(v) == i && !boundary(v)
      MDE.phase1(n, intra(i), contract)
    }
    tdOv = MDE.decompose(n, ovParts.flatten ++ SpatialPartitioner.interEdges(graph, pr))
    updOv = new ShortcutUpdater(tdOv)
    tdPart = new Array[TD](k); updPart = new Array[ShortcutUpdater](k)
    Parallel.run((0 until k).map(i => () => {
      val forced = new Array[Boolean](n)
      pr.boundaryOf(i).foreach(forced(_) = true)
      tdPart(i) = MDE.decompose(n, intra(i), forced, tdOv.rank)
      updPart(i) = new ShortcutUpdater(tdPart(i), boundary)
    }), threads)
    pch = new CHQuery(buildUpward())
    (System.nanoTime() - t0) / 1e9
  }

  private def buildUpward(): UpwardGraph = {
    val rank = new Array[Int](n)
    val nbrs = new Array[Array[Array[Int]]](n)
    val wts = new Array[Array[Array[Int]]](n)
    var v = 0
    while (v < n) {
      val i = part(v)
      if (boundary(v)) {
        rank(v) = k * n + tdOv.rank(v)
        nbrs(v) = Array(tdPart(i).bag(v), tdOv.bag(v))
        wts(v) = Array(tdPart(i).sc(v), tdOv.sc(v))
      } else {
        rank(v) = i * n + tdPart(i).rank(v)
        nbrs(v) = Array(tdPart(i).bag(v))
        wts(v) = Array(tdPart(i).sc(v))
      }
      v += 1
    }
    new UpwardGraph(n, rank, nbrs, wts)
  }

  def indexEntries: Long = tdOv.slotCount + tdPart.map(_.slotCount).sum

  def applyBatch(batch: Seq[(Int, Int, Int)]): IndexedSeq[QueryStage] = {
    val t0 = System.nanoTime()
    batch.foreach { case (u, v, w) => graph.setWeight(u, v, w) }
    val t1 = (System.nanoTime() - t0) / 1e9
    val intraBy = Array.fill(k)(new mutable.ArrayBuffer[(Int, Int, Int)]())
    val inter = new mutable.ArrayBuffer[(Int, Int, Int)]()
    batch.foreach { case e @ (u, v, _) =>
      if (part(u) == part(v)) intraBy(part(u)) += e else inter += e
    }
    val ovChanges = new java.util.concurrent.ConcurrentLinkedQueue[(Int, Int, Int)]()
    Parallel.run((0 until k).filter(intraBy(_).nonEmpty).map(i => () => {
      updPart(i).applyInputChanges(intraBy(i)).overlayChanges.foreach(ovChanges.add)
    }), threads)
    import scala.jdk.CollectionConverters._
    updOv.applyInputChanges(inter.toSeq ++ ovChanges.asScala.toSeq)
    val t2 = (System.nanoTime() - t0) / 1e9
    IndexedSeq(
      QueryStage(t1, "BiDij", (s, t) => BiDijkstra.query(graph, s, t)),
      QueryStage(t2, "PCH", bestQuery),
    )
  }

  def bestQuery(s: Int, t: Int): Int = pch.query(s, t)
}
