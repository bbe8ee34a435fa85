package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.{Datasets, GridGen, RoadGraph}
import repro.baseline._
import repro.core.sp.Dijkstra
import scala.util.Random

/** One registered test per (solution, graph): stage labels, ordering and
  * per-stage exactness — finer-grained than BaselineSpec's combined run.
  */
class SolutionStageSpec extends AnyFunSuite {

  private val graphs: Seq[(String, () => RoadGraph)] = Seq(
    "grid-6x14" -> (() => GridGen.grid(6, 14, seed = 701)),
    "grid-4x30" -> (() => GridGen.grid(4, 30, seed = 702)),
    "rand-100-60" -> (() => GridGen.randomConnected(100, 60, seed = 703)),
  )

  private val makers: Seq[(String, RoadGraph => Solution)] = Seq(
    "BiDijkstra" -> (g => new BiDijkstraSolution(g)),
    "DCH" -> (g => new DCHSolution(g)),
    "DH2H" -> (g => new DH2HSolution(g)),
    "MHL" -> (g => new MHLSolution(g)),
    "TOAIN" -> (g => new ToainSolution(g)),
    "N-CH-P" -> (g => new NCHPSolution(g, 3, 2)),
    "P-TD-P" -> (g => new PTDPSolution(g, 3, 2)),
    "PMHL" -> (g => new PMHLSolution(g, 3, 2)),
    "PostMHL" -> (g => new PostMHLSolution(g, 10, 6, 2)),
  )

  private val expectedStageCount = Map(
    "BiDijkstra" -> 1, "DCH" -> 2, "DH2H" -> 2, "MHL" -> 3, "TOAIN" -> 2,
    "N-CH-P" -> 2, "P-TD-P" -> 4, "PMHL" -> 5, "PostMHL" -> 4)

  for ((gName, mk) <- graphs; (sName, mkSol) <- makers) {
    test(s"$sName on $gName: stage structure and exactness") {
      val g = mk()
      val sol = mkSol(g)
      val batch = Datasets.updateBatch(sol.graph, math.max(6, g.m / 30), seed = 710)
      val stages = sol.applyBatch(batch)
      assert(stages.size == expectedStageCount(sName),
        s"expected ${expectedStageCount(sName)} stages, got ${stages.map(_.label)}")
      assert(stages.map(_.availableFrom) == stages.map(_.availableFrom).sorted)
      assert(stages.head.label == "BiDij" || sName == "BiDijkstra")
      val rnd = new Random(711)
      for (_ <- 1 to 30) {
        val s = rnd.nextInt(g.n); val t = rnd.nextInt(g.n)
        val truth = Dijkstra.query(sol.graph, s, t)
        for (st <- stages) assert(st.query(s, t) == truth, s"${st.label} ($s,$t)")
        assert(sol.bestQuery(s, t) == truth)
      }
    }
  }
}
