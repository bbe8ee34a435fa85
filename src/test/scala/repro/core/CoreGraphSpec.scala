package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.{Datasets, GridGen, RoadGraph}
import repro.core.sp.{BiDijkstra, Dijkstra}
import scala.util.Random

/** Substrate sanity: generators, graph structure, index-free SP. */
class CoreGraphSpec extends AnyFunSuite {

  test("grid generator: size, connectivity, determinism") {
    val g = GridGen.grid(8, 12, seed = 5)
    assert(g.n == 96)
    assert(GridGen.isConnected(g))
    val g2 = GridGen.grid(8, 12, seed = 5)
    assert(g.undirectedEdges == g2.undirectedEdges)
    val g3 = GridGen.grid(8, 12, seed = 6)
    assert(g.undirectedEdges != g3.undirectedEdges)
  }

  test("grid generator: hole fraction removes edges but keeps connectivity") {
    val full = GridGen.grid(10, 20, seed = 1, holeFrac = 0.0)
    val holed = GridGen.grid(10, 20, seed = 1, holeFrac = 0.2)
    assert(holed.m < full.m)
    assert(GridGen.isConnected(holed))
  }

  test("random connected generator is connected for many seeds") {
    for (seed <- 1 to 20) {
      val g = GridGen.randomConnected(60, 40, seed)
      assert(GridGen.isConnected(g), s"seed $seed")
    }
  }

  test("RoadGraph edge lookup and weight mutation are symmetric") {
    val g = GridGen.grid(5, 5, seed = 2)
    val (u, v, w) = g.undirectedEdges.head
    assert(g.weight(u, v) == w && g.weight(v, u) == w)
    g.setWeight(u, v, w + 7)
    assert(g.weight(u, v) == w + 7 && g.weight(v, u) == w + 7)
    assert(g.weight(0, g.n - 1) == -1)
  }

  test("RoadGraph.fromEdges dedups parallel edges keeping min weight") {
    val g = RoadGraph.fromEdges(3, Seq((0, 1, 5), (1, 0, 3), (1, 2, 2)))
    assert(g.m == 2)
    assert(g.weight(0, 1) == 3)
  }

  test("copyWeights isolates mutation") {
    val g = GridGen.grid(4, 4)
    val c = g.copyWeights()
    val (u, v, w) = g.undirectedEdges.head
    c.setWeight(u, v, w + 100)
    assert(g.weight(u, v) == w)
  }

  test("Dijkstra on a hand-built graph") {
    // 0-1 (2), 1-2 (3), 0-2 (10), 2-3 (1)
    val g = RoadGraph.fromEdges(4, Seq((0, 1, 2), (1, 2, 3), (0, 2, 10), (2, 3, 1)))
    val d = Dijkstra.sssp(g, 0)
    assert(d.toSeq == Seq(0, 2, 5, 6))
    assert(Dijkstra.query(g, 0, 3) == 6)
    assert(BiDijkstra.query(g, 0, 3) == 6)
  }

  test("BiDijkstra agrees with Dijkstra on random graphs and grids") {
    val rnd = new Random(11)
    val graphs = Seq(
      GridGen.grid(7, 11, seed = 3),
      GridGen.randomConnected(80, 60, seed = 4),
      GridGen.randomConnected(40, 10, seed = 9),
    )
    for (g <- graphs; _ <- 1 to 60) {
      val s = rnd.nextInt(g.n); val t = rnd.nextInt(g.n)
      assert(BiDijkstra.query(g, s, t) == Dijkstra.query(g, s, t), s"($s,$t)")
    }
  }

  test("update batch is deterministic, valid, and applies") {
    val g = Datasets.NY.copy(width = 10, length = 10).build()
    val b1 = Datasets.updateBatch(g, 15, seed = 3)
    val b2 = Datasets.updateBatch(g, 15, seed = 3)
    assert(b1 == b2)
    assert(b1.size == 15)
    assert(b1.map { case (u, v, _) => (math.min(u, v), math.max(u, v)) }.distinct.size == 15)
    for ((u, v, w) <- b1) {
      val old = g.weight(u, v)
      assert(old > 0)
      assert(w == math.max(1, old / 2) || w == old * 2)
    }
    Datasets.applyBatch(g, b1)
    for ((u, v, w) <- b1) assert(g.weight(u, v) == w)
  }

  test("all dataset specs build connected graphs (smallest three)") {
    for (spec <- Seq(Datasets.NY)) {
      val g = spec.build()
      assert(g.n == spec.nVertices)
      assert(GridGen.isConnected(g))
    }
  }
}
