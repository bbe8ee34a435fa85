package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.{Datasets, GridGen, RoadGraph}
import repro.baseline._
import repro.core.sp.Dijkstra
import scala.util.Random

/** Every Solution (ours + all six baselines) must return exact distances
  * from every released query stage, across update batches.
  */
class BaselineSpec extends AnyFunSuite {

  private def mkSolutions(g: RoadGraph): Seq[Solution] = Seq(
    new BiDijkstraSolution(g),
    new DCHSolution(g),
    new DH2HSolution(g),
    new MHLSolution(g),
    new ToainSolution(g),
    new NCHPSolution(g, k = 4, threads = 2),
    new PTDPSolution(g, k = 4, threads = 2),
    new PMHLSolution(g, k = 4, threads = 2),
    new PostMHLSolution(g, tau = 12, ke = 8, threads = 2),
  )

  test("all solutions exact after build") {
    val g = GridGen.grid(6, 20, seed = 101)
    val sols = mkSolutions(g)
    val rnd = new Random(102)
    for (_ <- 1 to 80) {
      val s = rnd.nextInt(g.n); val t = rnd.nextInt(g.n)
      val truth = Dijkstra.query(g, s, t)
      for (sol <- sols) assert(sol.bestQuery(s, t) == truth, s"${sol.name} ($s,$t)")
    }
  }

  test("all solutions exact at every stage after each batch") {
    val g = GridGen.grid(6, 16, seed = 103)
    val sols = mkSolutions(g)
    val rnd = new Random(104)
    for (r <- 1 to 3) {
      // Solutions own independent graph copies; generate the batch against
      // a reference copy and feed the same logical batch to each.
      val batch = Datasets.updateBatch(sols.head.graph, 15, seed = 3000 + r)
      val ref = g.copyWeights()
      // bring ref up to date with all batches so far
      for (sol <- sols) {
        val stages = sol.applyBatch(batch)
        assert(stages.map(_.availableFrom) == stages.map(_.availableFrom).sorted,
          s"${sol.name} stages not monotone")
        Datasets.applyBatch(ref, batch.toList.map(identity)) // idempotent re-apply is fine
        for (_ <- 1 to 25) {
          val s = rnd.nextInt(g.n); val t = rnd.nextInt(g.n)
          val truth = Dijkstra.query(sol.graph, s, t)
          for (st <- stages)
            assert(st.query(s, t) == truth, s"${sol.name}/${st.label} round $r ($s,$t)")
        }
      }
    }
  }

  test("solution graphs are isolated copies") {
    val g = GridGen.grid(4, 6, seed = 105)
    val a = new BiDijkstraSolution(g)
    val b = new DCHSolution(g)
    val (u, v, w) = g.undirectedEdges.head
    a.applyBatch(Seq((u, v, w + 50)))
    assert(g.weight(u, v) == w)
    assert(b.graph.weight(u, v) == w)
    assert(a.graph.weight(u, v) == w + 50)
  }

  test("index sizes ordering: hop-based bigger than shortcut-only, index-free zero") {
    val g = GridGen.grid(6, 20, seed = 106)
    val bidij = new BiDijkstraSolution(g)
    val dch = new DCHSolution(g)
    val dh2h = new DH2HSolution(g)
    assert(bidij.indexEntries == 0)
    assert(dch.indexEntries > 0)
    assert(dh2h.indexEntries > dch.indexEntries)
  }

  test("TOAIN update (rebuild) is slower than DCH update on the same batch") {
    val g = GridGen.grid(8, 60, seed = 107)
    val dch = new DCHSolution(g)
    val toain = new ToainSolution(g)
    val batch = Datasets.updateBatch(g, 20, seed = 108)
    val tDch = dch.applyBatch(batch).last.availableFrom
    val tToain = toain.applyBatch(batch).last.availableFrom
    assert(tToain > tDch, s"TOAIN refresh $tToain should exceed DCH update $tDch")
  }
}
