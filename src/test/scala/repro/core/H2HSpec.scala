package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.{GridGen, RoadGraph}
import repro.core.td.{MDE, TD}
import repro.core.h2h.{CHQuery, H2HIndex, UpwardGraph}
import repro.core.sp.Dijkstra
import scala.util.Random

/** CH query and H2H labels: exactness against Dijkstra ground truth. */
class H2HSpec extends AnyFunSuite {

  private def graphs: Seq[RoadGraph] = Seq(
    GridGen.grid(6, 9, seed = 21),
    GridGen.grid(4, 25, seed = 22),
    GridGen.randomConnected(80, 60, seed = 23),
    GridGen.randomConnected(25, 3, seed = 24),
  )

  test("CH query equals Dijkstra on all sampled pairs") {
    for (g <- graphs) {
      val td = MDE.decompose(g.n, g.undirectedEdges)
      val ch = new CHQuery(UpwardGraph.fromTD(td))
      val rnd = new Random(31)
      for (_ <- 1 to 150) {
        val s = rnd.nextInt(g.n); val t = rnd.nextInt(g.n)
        assert(ch.query(s, t) == Dijkstra.query(g, s, t), s"n=${g.n} ($s,$t)")
      }
    }
  }

  test("H2H query equals Dijkstra on all pairs of a small graph") {
    val g = GridGen.grid(5, 6, seed = 25)
    val td = MDE.decompose(g.n, g.undirectedEdges)
    val h = new H2HIndex(td); h.build()
    for (s <- 0 until g.n) {
      val d = Dijkstra.sssp(g, s)
      for (t <- 0 until g.n) assert(h.query(s, t) == d(t), s"($s,$t)")
    }
  }

  test("H2H query equals Dijkstra on sampled pairs of larger graphs") {
    for (g <- graphs) {
      val td = MDE.decompose(g.n, g.undirectedEdges)
      val h = new H2HIndex(td); h.build()
      val rnd = new Random(32)
      for (_ <- 1 to 200) {
        val s = rnd.nextInt(g.n); val t = rnd.nextInt(g.n)
        assert(h.query(s, t) == Dijkstra.query(g, s, t), s"n=${g.n} ($s,$t)")
      }
    }
  }

  test("H2H with boundary-first forced order is still exact (Lemma 3 setting)") {
    val g = GridGen.grid(6, 10, seed = 26)
    val forced = new Array[Boolean](g.n)
    val rnd = new Random(33)
    (1 to 10).foreach(_ => forced(rnd.nextInt(g.n)) = true)
    val td = MDE.decompose(g.n, g.undirectedEdges, forcedLast = forced)
    val h = new H2HIndex(td); h.build()
    for (_ <- 1 to 200) {
      val s = rnd.nextInt(g.n); val t = rnd.nextInt(g.n)
      assert(h.query(s, t) == Dijkstra.query(g, s, t), s"($s,$t)")
    }
  }

  test("label entries count matches sum of depths + n") {
    val g = GridGen.grid(5, 7, seed = 27)
    val td = MDE.decompose(g.n, g.undirectedEdges)
    val h = new H2HIndex(td); h.build()
    assert(h.labelEntries == td.depth.map(_.toLong).sum + g.n)
  }

  test("H2H on disconnected graph returns Inf across components") {
    val edges = Seq((0, 1, 3), (1, 2, 4), (3, 4, 5))
    val td = MDE.decompose(5, edges)
    val h = new H2HIndex(td); h.build()
    assert(h.query(0, 2) == 7)
    assert(h.query(0, 4) == TD.Inf)
    assert(h.query(3, 4) == 5)
  }
}
