package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.{Datasets, GridGen, RoadGraph}
import repro.core.td.{MDE, ShortcutUpdater, TD}
import repro.core.h2h.{CHQuery, H2HIndex, UpwardGraph}
import repro.core.sp.{BiDijkstra, Dijkstra}
import scala.util.Random

/** Parameterized exactness tests: one registered test per (graph, check)
  * so failures localize, spanning grid shapes, random topologies, and
  * forced orders.
  */
class ParamizedCoreSpec extends AnyFunSuite {

  private val cases: Seq[(String, () => RoadGraph)] = Seq(
    "grid-4x4" -> (() => GridGen.grid(4, 4, seed = 301)),
    "grid-3x40" -> (() => GridGen.grid(3, 40, seed = 302)),
    "grid-10x10" -> (() => GridGen.grid(10, 10, seed = 303)),
    "grid-2x50" -> (() => GridGen.grid(2, 50, seed = 304)),
    "rand-50-40" -> (() => GridGen.randomConnected(50, 40, seed = 305)),
    "rand-120-20" -> (() => GridGen.randomConnected(120, 20, seed = 306)),
    "rand-20-60" -> (() => GridGen.randomConnected(20, 60, seed = 307)),
    "path-60" -> (() => GridGen.grid(1, 60, seed = 308)),
  )

  for ((name, mk) <- cases) {
    test(s"BiDijkstra exact on $name") {
      val g = mk(); val rnd = new Random(1)
      for (_ <- 1 to 40) {
        val s = rnd.nextInt(g.n); val t = rnd.nextInt(g.n)
        assert(BiDijkstra.query(g, s, t) == Dijkstra.query(g, s, t))
      }
    }
    test(s"CH exact on $name") {
      val g = mk()
      val td = MDE.decompose(g.n, g.undirectedEdges)
      val ch = new CHQuery(UpwardGraph.fromTD(td))
      val rnd = new Random(2)
      for (_ <- 1 to 40) {
        val s = rnd.nextInt(g.n); val t = rnd.nextInt(g.n)
        assert(ch.query(s, t) == Dijkstra.query(g, s, t))
      }
    }
    test(s"H2H exact on $name") {
      val g = mk()
      val td = MDE.decompose(g.n, g.undirectedEdges)
      val h = new H2HIndex(td); h.build()
      val rnd = new Random(3)
      for (_ <- 1 to 40) {
        val s = rnd.nextInt(g.n); val t = rnd.nextInt(g.n)
        assert(h.query(s, t) == Dijkstra.query(g, s, t))
      }
    }
    test(s"maintenance round-trip exact on $name") {
      val g = mk()
      val td = MDE.decompose(g.n, g.undirectedEdges)
      val upd = new ShortcutUpdater(td)
      val h = new H2HIndex(td); h.build()
      val rnd = new Random(4)
      for (r <- 1 to 2) {
        val batch = Datasets.updateBatch(g, math.max(4, g.m / 20), 400 + r)
        Datasets.applyBatch(g, batch)
        h.updateSubtrees(upd.applyInputChanges(batch).affected)
        for (_ <- 1 to 25) {
          val s = rnd.nextInt(g.n); val t = rnd.nextInt(g.n)
          assert(h.query(s, t) == Dijkstra.query(g, s, t))
        }
      }
    }
  }

  // SSSP structural properties on a couple of graphs.
  for ((name, mk) <- cases.take(3)) {
    test(s"Dijkstra properties on $name: zero-self, symmetry, triangle") {
      val g = mk()
      val rnd = new Random(5)
      val vs = Seq.fill(4)(rnd.nextInt(g.n))
      val d = vs.map(v => v -> Dijkstra.sssp(g, v)).toMap
      for (v <- vs) assert(d(v)(v) == 0)
      for (a <- vs; b <- vs) assert(d(a)(b) == Dijkstra.query(g, b, a), "undirected symmetry")
      for (a <- vs; b <- vs; c <- vs)
        assert(d(a)(c) <= d(a)(b).toLong + Dijkstra.query(g, b, c), "triangle inequality")
    }
    test(s"weight decrease never increases distances on $name") {
      val g = mk()
      val before = Dijkstra.sssp(g, 0)
      val edges = g.undirectedEdges
      val rnd = new Random(6)
      rnd.shuffle(edges.toList).take(10).foreach { case (u, v, w) =>
        g.setWeight(u, v, math.max(1, w / 2))
      }
      val after = Dijkstra.sssp(g, 0)
      for (t <- 0 until g.n) assert(after(t) <= before(t))
    }
  }
}
