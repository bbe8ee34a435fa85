package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.{Datasets, GridGen}
import repro.core.pmhl.PMHL
import repro.core.postmhl.PostMHL
import repro.core.sp.Dijkstra
import scala.util.Random

/** Targeted query-type coverage: the paper's same-partition ("city-level")
  * vs cross-partition ("cross-province") cases, plus queries with boundary
  * or overlay endpoints — each registered as its own test.
  */
class QueryTypeSpec extends AnyFunSuite {

  private def pmhl(): (PMHL, repro.graph.RoadGraph) = {
    val g = GridGen.grid(6, 26, seed = 801)
    val p = new PMHL(g, 4, threads = 2)
    p.build()
    val batch = Datasets.updateBatch(g, 25, seed = 802)
    p.applyUpdateBatch(batch)
    (p, g)
  }

  private def postmhl(): (PostMHL, repro.graph.RoadGraph) = {
    val g = GridGen.grid(6, 26, seed = 803)
    val p = new PostMHL(g, 12, 8, 0.1, 2.0, threads = 2)
    val batch = Datasets.updateBatch(g, 25, seed = 804)
    p.applyUpdateBatch(batch)
    (p, g)
  }

  test("PMHL same-partition interior pairs") {
    val (p, g) = pmhl()
    val rnd = new Random(810)
    val interior = (0 until g.n).filterNot(p.boundary)
    var done = 0
    while (done < 40) {
      val s = interior(rnd.nextInt(interior.size)); val t = interior(rnd.nextInt(interior.size))
      if (p.part(s) == p.part(t)) {
        val truth = Dijkstra.query(g, s, t)
        assert(p.queryNoBoundary(s, t) == truth)
        assert(p.queryPostBoundary(s, t) == truth)
        assert(p.queryCrossBoundary(s, t) == truth)
        done += 1
      }
    }
  }

  test("PMHL cross-partition interior pairs") {
    val (p, g) = pmhl()
    val rnd = new Random(811)
    val interior = (0 until g.n).filterNot(p.boundary)
    var done = 0
    while (done < 40) {
      val s = interior(rnd.nextInt(interior.size)); val t = interior(rnd.nextInt(interior.size))
      if (p.part(s) != p.part(t)) {
        val truth = Dijkstra.query(g, s, t)
        assert(p.queryNoBoundary(s, t) == truth)
        assert(p.queryCrossBoundary(s, t) == truth)
        done += 1
      }
    }
  }

  test("PMHL boundary-endpoint pairs (all four §III-C cases)") {
    val (p, g) = pmhl()
    val rnd = new Random(812)
    val bs = (0 until g.n).filter(p.boundary)
    for (_ <- 1 to 30) {
      val b1 = bs(rnd.nextInt(bs.size)); val b2 = bs(rnd.nextInt(bs.size))
      val v = rnd.nextInt(g.n)
      assert(p.queryCrossBoundary(b1, b2) == Dijkstra.query(g, b1, b2))
      assert(p.queryCrossBoundary(b1, v) == Dijkstra.query(g, b1, v))
      assert(p.queryNoBoundary(b1, v) == Dijkstra.query(g, b1, v))
      assert(p.queryPostBoundary(v, b2) == Dijkstra.query(g, v, b2))
    }
  }

  test("PostMHL same-partition pairs at post and full stages") {
    val (p, g) = postmhl()
    val rnd = new Random(813)
    val inPart = (0 until g.n).filter(p.partOf(_) != -1)
    var done = 0
    while (done < 40) {
      val s = inPart(rnd.nextInt(inPart.size)); val t = inPart(rnd.nextInt(inPart.size))
      if (p.partOf(s) == p.partOf(t)) {
        val truth = Dijkstra.query(g, s, t)
        assert(p.queryPost(s, t) == truth)
        assert(p.queryFull(s, t) == truth)
        done += 1
      }
    }
  }

  test("PostMHL cross-partition and overlay-endpoint pairs") {
    val (p, g) = postmhl()
    val rnd = new Random(814)
    val ov = (0 until g.n).filter(p.partOf(_) == -1)
    assert(ov.nonEmpty)
    for (_ <- 1 to 40) {
      val o = ov(rnd.nextInt(ov.size)); val v = rnd.nextInt(g.n)
      assert(p.queryPost(o, v) == Dijkstra.query(g, o, v), s"post ($o,$v)")
      assert(p.queryFull(o, v) == Dijkstra.query(g, o, v), s"full ($o,$v)")
    }
    var done = 0
    while (done < 30) {
      val s = rnd.nextInt(g.n); val t = rnd.nextInt(g.n)
      if (p.partOf(s) != -1 && p.partOf(t) != -1 && p.partOf(s) != p.partOf(t)) {
        assert(p.queryPost(s, t) == Dijkstra.query(g, s, t))
        assert(p.queryFull(s, t) == Dijkstra.query(g, s, t))
        done += 1
      }
    }
  }

  test("adjacent-vertex and identical-vertex queries") {
    val (p, g) = pmhl()
    for ((u, v, w) <- g.undirectedEdges.take(30)) {
      val truth = Dijkstra.query(g, u, v) // may be < w via another path
      assert(p.queryCrossBoundary(u, v) == truth)
      assert(truth <= w)
    }
    for (v <- 0 until math.min(g.n, 50)) {
      assert(p.queryCrossBoundary(v, v) == 0)
      assert(p.queryPCH(v, v) == 0)
    }
  }
}
