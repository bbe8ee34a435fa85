package repro.baseline

import repro.graph.RoadGraph

/** One query stage released during index maintenance: from `availableFrom`
  * seconds after batch arrival, `query` is the fastest correct algorithm.
  */
final case class QueryStage(availableFrom: Double, label: String, query: (Int, Int) => Int)

/** A dynamic shortest-path solution under the paper's batch-update system
  * model (§II): build once, then for each update batch produce the stage
  * timeline that the throughput model (repro.throughput.QueueSim) replays.
  *
  * Every implementation owns its private copy of the road network, so the
  * same update batches can be fed to all solutions independently.
  */
trait Solution {
  def name: String
  /** The solution's private graph (mutated by applyBatch). */
  def graph: RoadGraph
  /** Construction wall-seconds (t_c). */
  def buildSeconds: Double
  /** Index size in entries (|L|; 0 for index-free). */
  def indexEntries: Long
  /** Install one update batch; returns the released query stages in order.
    * Stage availableFrom values are cumulative seconds from batch arrival.
    */
  def applyBatch(batch: Seq[(Int, Int, Int)]): IndexedSeq[QueryStage]
  /** Fastest (final-stage) query — used for correctness checks and t_q. */
  def bestQuery(s: Int, t: Int): Int
}
