package repro.graph

import scala.collection.mutable.ArrayBuffer
import scala.util.Random

/** Synthetic road networks, deterministic in seed (DESIGN.md §2).
  *
  * The primary generator is a W×L "corridor grid": a lattice whose short
  * side W bounds the treewidth, mirroring the small-separator structure of
  * real road networks that MDE/H2H exploit. A fraction of lattice edges is
  * deleted (keeping connectivity) so partitions/bags are irregular like
  * real intersections, and weights are pseudo-random travel times.
  */
object GridGen {

  /** splitmix-style hash for deterministic per-edge weights. */
  private def mix(seed: Long, a: Long, b: Long): Long = {
    var z = seed + 0x9e3779b97f4a7c15L * (a * 0x100000001b3L + b + 1)
    z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
    z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
    z ^ (z >>> 31)
  }

  private def edgeWeight(seed: Long, u: Int, v: Int, maxW: Int): Int =
    1 + (math.abs(mix(seed, math.min(u, v), math.max(u, v))) % maxW).toInt

  /** W×L lattice with deterministic weights in [1, maxW].
    *
    * About `holeFrac` of the lattice edges are removed (deterministic in
    * seed) for irregularity. Connectivity is guaranteed by protecting a
    * deterministic spanning tree (union-find over edges in scan order):
    * only non-tree edges are eligible to become holes.
    */
  def grid(width: Int, length: Int, seed: Long = 42, maxW: Int = 100,
           holeFrac: Double = 0.1): RoadGraph = {
    val n = width * length
    def id(r: Int, c: Int) = r * width + c
    // (u, v, weight, holeCandidate)
    val all = new ArrayBuffer[(Int, Int, Int, Boolean)](2 * n)
    val thresh = (holeFrac * 1000).toInt
    for (r <- 0 until length; c <- 0 until width) {
      if (c + 1 < width) {
        val u = id(r, c); val v = id(r, c + 1)
        val hole = (math.abs(mix(seed + 7, u, v)) % 1000) < thresh
        all += ((u, v, edgeWeight(seed, u, v, maxW), hole))
      }
      if (r + 1 < length) {
        val u = id(r, c); val v = id(r + 1, c)
        val hole = (math.abs(mix(seed + 13, u, v)) % 1000) < thresh
        all += ((u, v, edgeWeight(seed + 1, u, v, maxW), hole))
      }
    }
    // Union-find spanning tree over non-hole edges first, then hole edges:
    // a hole edge that is needed for connectivity is kept (protected).
    val uf = new Array[Int](n)
    for (i <- 0 until n) uf(i) = i
    def find(x: Int): Int = { var r = x; while (uf(r) != r) r = uf(r); var c = x; while (uf(c) != r) { val nx = uf(c); uf(c) = r; c = nx }; r }
    def union(a: Int, b: Int): Boolean = { val ra = find(a); val rb = find(b); if (ra == rb) false else { uf(ra) = rb; true } }
    val edges = new ArrayBuffer[(Int, Int, Int)](all.size)
    for ((u, v, w, hole) <- all if !hole) { union(u, v); edges += ((u, v, w)) }
    for ((u, v, w, hole) <- all if hole) if (union(u, v)) edges += ((u, v, w))
    val xs = new Array[Double](n); val ys = new Array[Double](n)
    for (r <- 0 until length; c <- 0 until width) { xs(id(r, c)) = c; ys(id(r, c)) = r }
    RoadGraph.fromEdges(n, edges.toSeq, xs, ys)
  }

  /** Random connected graph (spanning tree + extra edges) for property tests. */
  def randomConnected(n: Int, extraEdges: Int, seed: Long = 7, maxW: Int = 50): RoadGraph = {
    val rnd = new Random(seed)
    val edges = new ArrayBuffer[(Int, Int, Int)](n + extraEdges)
    for (v <- 1 until n) edges += ((rnd.nextInt(v), v, 1 + rnd.nextInt(maxW)))
    var added = 0
    while (added < extraEdges) {
      val u = rnd.nextInt(n); val v = rnd.nextInt(n)
      if (u != v) { edges += ((u, v, 1 + rnd.nextInt(maxW))); added += 1 }
    }
    val xs = Array.fill(n)(rnd.nextDouble()); val ys = Array.fill(n)(rnd.nextDouble())
    RoadGraph.fromEdges(n, edges.toSeq, xs, ys)
  }

  /** Connectivity check (BFS) — used by tests and dataset sanity asserts. */
  def isConnected(g: RoadGraph): Boolean = {
    if (g.n == 0) return true
    val seen = new Array[Boolean](g.n)
    val stack = new java.util.ArrayDeque[Integer]()
    stack.push(0); seen(0) = true
    var cnt = 0
    while (!stack.isEmpty) {
      val u = stack.pop().intValue()
      cnt += 1
      g.foreachNeighbor(u) { (v, _) => if (!seen(v)) { seen(v) = true; stack.push(v) } }
    }
    cnt == g.n
  }
}
