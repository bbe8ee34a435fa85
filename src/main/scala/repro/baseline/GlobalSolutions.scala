package repro.baseline

import repro.graph.RoadGraph
import repro.core.td.{MDE, ShortcutUpdater, TD}
import repro.core.h2h.{CHQuery, H2HIndex, UpwardGraph}
import repro.core.sp.BiDijkstra

/** Index-free baseline: BiDijkstra [11]. Updates are just edge refreshes. */
final class BiDijkstraSolution(g0: RoadGraph) extends Solution {
  val graph: RoadGraph = g0.copyWeights()
  val name = "BiDijkstra"
  val buildSeconds = 0.0
  val indexEntries = 0L
  def applyBatch(batch: Seq[(Int, Int, Int)]): IndexedSeq[QueryStage] = {
    val t0 = System.nanoTime()
    batch.foreach { case (u, v, w) => graph.setWeight(u, v, w) }
    IndexedSeq(QueryStage((System.nanoTime() - t0) / 1e9, "BiDij", bestQuery))
  }
  def bestQuery(s: Int, t: Int): Int = BiDijkstra.query(graph, s, t)
}

/** DCH [32]: global CH index with shortcut-centric maintenance; CH query.
  * BiDijkstra serves queries while the shortcuts are being repaired.
  */
final class DCHSolution(g0: RoadGraph) extends Solution {
  val graph: RoadGraph = g0.copyWeights()
  val name = "DCH"
  private var td: TD = _
  private var upd: ShortcutUpdater = _
  private var ch: CHQuery = _
  val buildSeconds: Double = {
    val t0 = System.nanoTime()
    td = MDE.decompose(graph.n, graph.undirectedEdges)
    upd = new ShortcutUpdater(td)
    ch = new CHQuery(UpwardGraph.fromTD(td))
    (System.nanoTime() - t0) / 1e9
  }
  def indexEntries: Long = td.slotCount
  def applyBatch(batch: Seq[(Int, Int, Int)]): IndexedSeq[QueryStage] = {
    val t0 = System.nanoTime()
    batch.foreach { case (u, v, w) => graph.setWeight(u, v, w) }
    val t1 = (System.nanoTime() - t0) / 1e9
    upd.applyInputChanges(batch)
    val t2 = (System.nanoTime() - t0) / 1e9
    IndexedSeq(
      QueryStage(t1, "BiDij", (s, t) => BiDijkstra.query(graph, s, t)),
      QueryStage(t2, "CH", bestQuery),
    )
  }
  def bestQuery(s: Int, t: Int): Int = ch.query(s, t)
}

/** DH2H [33]: global H2H with shortcut + label maintenance; BiDijkstra
  * covers the entire (long) maintenance window — the paper's setup for
  * index-based baselines.
  */
final class DH2HSolution(g0: RoadGraph) extends Solution {
  val graph: RoadGraph = g0.copyWeights()
  val name = "DH2H"
  private var td: TD = _
  private var upd: ShortcutUpdater = _
  private var lab: H2HIndex = _
  val buildSeconds: Double = {
    val t0 = System.nanoTime()
    td = MDE.decompose(graph.n, graph.undirectedEdges)
    upd = new ShortcutUpdater(td)
    lab = new H2HIndex(td); lab.build()
    td.buildLca()
    (System.nanoTime() - t0) / 1e9
  }
  def indexEntries: Long = td.slotCount + lab.labelEntries
  def applyBatch(batch: Seq[(Int, Int, Int)]): IndexedSeq[QueryStage] = {
    val t0 = System.nanoTime()
    batch.foreach { case (u, v, w) => graph.setWeight(u, v, w) }
    val t1 = (System.nanoTime() - t0) / 1e9
    val res = upd.applyInputChanges(batch)
    lab.updateSubtrees(res.affected)
    val t2 = (System.nanoTime() - t0) / 1e9
    IndexedSeq(
      QueryStage(t1, "BiDij", (s, t) => BiDijkstra.query(graph, s, t)),
      QueryStage(t2, "H2H", bestQuery),
    )
  }
  def bestQuery(s: Int, t: Int): Int = lab.query(s, t)
}

/** MHL (§V-A): the non-partitioned multi-stage index — DH2H extended with
  * the CH stage released between shortcut and label maintenance.
  */
final class MHLSolution(g0: RoadGraph) extends Solution {
  val graph: RoadGraph = g0.copyWeights()
  val name = "MHL"
  private var td: TD = _
  private var upd: ShortcutUpdater = _
  private var lab: H2HIndex = _
  private var ch: CHQuery = _
  val buildSeconds: Double = {
    val t0 = System.nanoTime()
    td = MDE.decompose(graph.n, graph.undirectedEdges)
    upd = new ShortcutUpdater(td)
    lab = new H2HIndex(td); lab.build()
    ch = new CHQuery(UpwardGraph.fromTD(td))
    td.buildLca()
    (System.nanoTime() - t0) / 1e9
  }
  def indexEntries: Long = td.slotCount + lab.labelEntries
  def applyBatch(batch: Seq[(Int, Int, Int)]): IndexedSeq[QueryStage] = {
    val t0 = System.nanoTime()
    batch.foreach { case (u, v, w) => graph.setWeight(u, v, w) }
    val t1 = (System.nanoTime() - t0) / 1e9
    val res = upd.applyInputChanges(batch)
    val t2 = (System.nanoTime() - t0) / 1e9
    lab.updateSubtrees(res.affected)
    val t3 = (System.nanoTime() - t0) / 1e9
    IndexedSeq(
      QueryStage(t1, "BiDij", (s, t) => BiDijkstra.query(graph, s, t)),
      QueryStage(t2, "CH", (s, t) => ch.query(s, t)),
      QueryStage(t3, "H2H", bestQuery),
    )
  }
  def bestQuery(s: Int, t: Int): Int = lab.query(s, t)
}

/** TOAIN [37] adapted to dynamic networks exactly as the paper does: a
  * static CH(SCOB)-style index whose shortcuts are *refreshed* (rebuilt)
  * when a batch arrives — static-CH query speed, rebuild-priced updates
  * (see DESIGN.md substitution table).
  */
final class ToainSolution(g0: RoadGraph) extends Solution {
  val graph: RoadGraph = g0.copyWeights()
  val name = "TOAIN"
  private var td: TD = _
  private var ch: CHQuery = _
  val buildSeconds: Double = {
    val t0 = System.nanoTime()
    rebuild()
    (System.nanoTime() - t0) / 1e9
  }
  private def rebuild(): Unit = {
    td = MDE.decompose(graph.n, graph.undirectedEdges)
    ch = new CHQuery(UpwardGraph.fromTD(td))
  }
  def indexEntries: Long = td.slotCount
  def applyBatch(batch: Seq[(Int, Int, Int)]): IndexedSeq[QueryStage] = {
    val t0 = System.nanoTime()
    batch.foreach { case (u, v, w) => graph.setWeight(u, v, w) }
    val t1 = (System.nanoTime() - t0) / 1e9
    rebuild()
    val t2 = (System.nanoTime() - t0) / 1e9
    IndexedSeq(
      QueryStage(t1, "BiDij", (s, t) => BiDijkstra.query(graph, s, t)),
      QueryStage(t2, "CH", bestQuery),
    )
  }
  def bestQuery(s: Int, t: Int): Int = ch.query(s, t)
}
