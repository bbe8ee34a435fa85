package repro.core.td

import scala.collection.mutable

/** Minimum Degree Elimination [53], [54] — builds the tree decomposition
  * (and, per Lemma 4, the CH shortcut index) of a weighted graph.
  *
  * Supports the boundary-first vertex orderings the paper's PSP indexes
  * need (§IV-B): vertices in `forcedLast` are eliminated strictly after
  * all others, either by min-degree among themselves or in an externally
  * fixed order (`forcedRank`) so partition boundary orders can be made
  * consistent with the overlay order (Figure 5, condition 2).
  */
object MDE {
  import TD.Inf

  private val ForcedOffset = 1 << 26

  private def pairKey(a: Int, b: Int): Long =
    if (a < b) (a.toLong << 32) | b.toLong else (b.toLong << 32) | a.toLong

  /** Deduplicate undirected edges keeping the min weight. */
  private def inputMap(edges: Iterable[(Int, Int, Int)]): mutable.LongMap[Int] = {
    val m = new mutable.LongMap[Int]()
    edges.foreach { case (u, v, w) =>
      require(u != v, "self loop")
      val k = pairKey(u, v)
      if (!m.contains(k) || w < m(k)) m(k) = w
    }
    m
  }

  /** Full decomposition of the graph (n vertices, undirected weighted edges).
    *
    * @param forcedLast  null, or flags of vertices eliminated after all others
    * @param forcedRank  null, or a fixed relative order for the forcedLast set
    *                    (smaller rank eliminated first); ignored for others
    */
  def decompose(n: Int, edges: Iterable[(Int, Int, Int)],
                forcedLast: Array[Boolean] = null,
                forcedRank: Array[Int] = null): TD = {
    val input = inputMap(edges)
    val adj = Array.fill(n)(new mutable.HashMap[Int, Int]())
    input.foreach { case (k, w) =>
      val u = (k >>> 32).toInt; val v = (k & 0xffffffffL).toInt
      adj(u)(v) = w; adj(v)(u) = w
    }
    val forced = if (forcedLast != null) forcedLast else new Array[Boolean](n)

    def prio(v: Int): Int =
      if (!forced(v)) adj(v).size
      else ForcedOffset + (if (forcedRank != null) forcedRank(v) else adj(v).size)

    val pq = new java.util.PriorityQueue[java.lang.Long]()
    var v0 = 0
    while (v0 < n) { pq.add((prio(v0).toLong << 32) | v0.toLong); v0 += 1 }

    val rank = Array.fill(n)(-1)
    val order = new Array[Int](n)
    val rawBag = new Array[Array[Int]](n)
    val rawSc = new Array[Array[Int]](n)
    val supportersMap = new mutable.LongMap[mutable.ArrayBuffer[Int]]()

    var r = 0
    while (r < n) {
      // Lazy-deletion pop: skip stale (contracted or outdated-priority) entries.
      var v = -1
      var done = false
      while (!done) {
        val top = pq.poll().longValue()
        val p = (top >>> 32).toInt; val cand = (top & 0xffffffffL).toInt
        if (rank(cand) == -1 && p == prio(cand)) { v = cand; done = true }
      }
      rank(v) = r; order(r) = v
      val nbrs = adj(v).toArray
      rawBag(v) = nbrs.map(_._1)
      rawSc(v) = nbrs.map(_._2)
      // All-pair shortcuts among the bag; record v as supporter of each pair.
      var i = 0
      while (i < nbrs.length) {
        val (a, wa) = nbrs(i)
        var j = i + 1
        while (j < nbrs.length) {
          val (b, wb) = nbrs(j)
          val ns = wa + wb
          val cur = adj(a).getOrElse(b, Inf)
          if (ns < cur) { adj(a)(b) = ns; adj(b)(a) = ns }
          supportersMap.getOrElseUpdate(pairKey(a, b), new mutable.ArrayBuffer[Int](4)) += v
          j += 1
        }
        i += 1
      }
      // Remove v; refresh neighbor priorities lazily.
      i = 0
      while (i < nbrs.length) {
        val a = nbrs(i)._1
        adj(a).remove(v)
        pq.add((prio(a).toLong << 32) | a.toLong)
        i += 1
      }
      adj(v).clear()
      r += 1
    }

    // Sort bags by rank descending (parent = last), build base/supporters.
    val bag = new Array[Array[Int]](n)
    val sc = new Array[Array[Int]](n)
    val base = new Array[Array[Int]](n)
    val sup = new Array[Array[Array[Int]]](n)
    val parent = Array.fill(n)(-1)
    var v = 0
    while (v < n) {
      val idx = rawBag(v).indices.toArray.sortBy(i => -rank(rawBag(v)(i)))
      bag(v) = idx.map(rawBag(v))
      sc(v) = idx.map(rawSc(v))
      base(v) = bag(v).map { x =>
        val k = pairKey(v, x)
        if (input.contains(k)) input(k) else Inf
      }
      sup(v) = bag(v).map { x =>
        supportersMap.get(pairKey(v, x)).map(_.toArray).getOrElse(Array.emptyIntArray)
      }
      if (bag(v).nonEmpty) parent(v) = bag(v).last
      v += 1
    }

    val childBuf = Array.fill(n)(new mutable.ArrayBuffer[Int](2))
    v = 0
    while (v < n) { if (parent(v) != -1) childBuf(parent(v)) += v; v += 1 }
    val children = childBuf.map(_.toArray)
    val roots = (0 until n).filter(parent(_) == -1).toArray

    // Depth via top-down order (parents have higher rank, so walk order desc).
    val depth = new Array[Int](n)
    var ri = n - 1
    while (ri >= 0) {
      val u = order(ri)
      depth(u) = if (parent(u) == -1) 0 else depth(parent(u)) + 1
      ri -= 1
    }

    new TD(n, rank, order, parent, children, depth, bag, sc, base, sup, roots)
  }

  /** Phase-1 contraction: eliminate only the `contract`-marked vertices by
    * min-degree and return the remaining graph among unmarked vertices —
    * exactly the Theorem-2 overlay input (boundary shortcuts formed by the
    * MDE of Step 1, without touching the boundary order).
    */
  def phase1(n: Int, edges: Iterable[(Int, Int, Int)],
             contract: Array[Boolean]): Seq[(Int, Int, Int)] = {
    val input = inputMap(edges)
    val adj = Array.fill(n)(new mutable.HashMap[Int, Int]())
    input.foreach { case (k, w) =>
      val u = (k >>> 32).toInt; val v = (k & 0xffffffffL).toInt
      adj(u)(v) = w; adj(v)(u) = w
    }
    val pq = new java.util.PriorityQueue[java.lang.Long]()
    val contracted = new Array[Boolean](n)
    var total = 0
    var v0 = 0
    while (v0 < n) {
      if (contract(v0)) { pq.add((adj(v0).size.toLong << 32) | v0.toLong); total += 1 }
      v0 += 1
    }
    var r = 0
    while (r < total) {
      var v = -1
      var done = false
      while (!done) {
        val top = pq.poll().longValue()
        val p = (top >>> 32).toInt; val cand = (top & 0xffffffffL).toInt
        if (!contracted(cand) && p == adj(cand).size) { v = cand; done = true }
      }
      contracted(v) = true
      val nbrs = adj(v).toArray
      var i = 0
      while (i < nbrs.length) {
        val (a, wa) = nbrs(i)
        var j = i + 1
        while (j < nbrs.length) {
          val (b, wb) = nbrs(j)
          val ns = wa + wb
          if (ns < adj(a).getOrElse(b, Inf)) { adj(a)(b) = ns; adj(b)(a) = ns }
          j += 1
        }
        i += 1
      }
      i = 0
      while (i < nbrs.length) {
        val a = nbrs(i)._1
        adj(a).remove(v)
        if (contract(a) && !contracted(a)) pq.add((adj(a).size.toLong << 32) | a.toLong)
        i += 1
      }
      adj(v).clear()
      r += 1
    }
    val out = new mutable.ArrayBuffer[(Int, Int, Int)]()
    var u = 0
    while (u < n) {
      if (!contract(u)) adj(u).foreach { case (x, w) => if (u < x && w < Inf) out += ((u, x, w)) }
      u += 1
    }
    out.toSeq
  }
}
