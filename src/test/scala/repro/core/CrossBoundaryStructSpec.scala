package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.GridGen
import repro.core.pmhl.PMHL
import repro.core.sp.Dijkstra
import scala.util.Random

/** Structural invariants of the PMHL cross-boundary tree T* (Algorithm 1)
  * beyond query exactness.
  */
class CrossBoundaryStructSpec extends AnyFunSuite {

  private def build(): (PMHL, repro.graph.RoadGraph) = {
    val g = GridGen.grid(6, 22, seed = 601)
    val p = new PMHL(g, 4, threads = 2)
    p.build()
    (p, g)
  }

  test("T* parents: overlay vertices keep overlay parents, others partition parents") {
    val (p, g) = build()
    val c = p.cross
    for (v <- 0 until g.n) {
      if (p.boundary(v)) assert(c.parentStar(v) == p.tdOv.parent(v))
      else assert(c.parentStar(v) == p.tdPart(p.part(v)).parent(v))
    }
  }

  test("T* depths consistent with parents and overlay depths") {
    val (p, g) = build()
    val c = p.cross
    for (v <- 0 until g.n) {
      if (c.parentStar(v) == -1) assert(c.depthStar(v) == 0)
      else assert(c.depthStar(v) == c.depthStar(c.parentStar(v)) + 1)
      if (p.boundary(v)) assert(c.depthStar(v) == p.tdOv.depth(v))
    }
  }

  test("cross labels store exact global distances to T* ancestors") {
    val (p, g) = build()
    val c = p.cross
    val rnd = new Random(602)
    val nonB = (0 until g.n).filterNot(p.boundary)
    for (_ <- 1 to 25) {
      val v = nonB(rnd.nextInt(nonB.size))
      val ds = c.disStarOf(v)
      // walk the ancestor chain via parentStar
      var a = v
      val chain = scala.collection.mutable.ArrayBuffer[Int]()
      while (a != -1) { chain += a; a = c.parentStar(a) }
      for (x <- chain)
        assert(ds(c.depthStar(x)) == Dijkstra.query(g, v, x),
          s"dis*($v -> $x)")
    }
  }

  test("boundary arrays store exact distances to home-partition boundary") {
    val (p, g) = build()
    val c = p.cross
    val rnd = new Random(603)
    val nonB = (0 until g.n).filterNot(p.boundary)
    for (_ <- 1 to 20) {
      val v = nonB(rnd.nextInt(nonB.size))
      val bs = p.partBoundary(p.part(v))
      for ((b, j) <- bs.zipWithIndex)
        assert(c.disBOf(v)(j) == Dijkstra.query(g, v, b), s"disB($v -> $b)")
    }
  }

  test("LCA of cross-partition pairs is always an overlay vertex") {
    val (p, g) = build()
    val c = p.cross
    val rnd = new Random(604)
    var checked = 0
    for (_ <- 1 to 300 if checked < 100) {
      val s = rnd.nextInt(g.n); val t = rnd.nextInt(g.n)
      if (p.part(s) != p.part(t)) {
        val a = c.lcaStar.lca(s, t)
        if (a != -1) { assert(p.boundary(a), s"LCA($s,$t)=$a not overlay"); checked += 1 }
      }
    }
    assert(checked > 0)
  }

  test("overlay vertices read through to the live overlay labels") {
    val (p, g) = build()
    val c = p.cross
    val someB = (0 until g.n).find(p.boundary).get
    assert(c.disStarOf(someB) eq p.labOv.dis(someB))
  }
}
