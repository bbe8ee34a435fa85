package repro.core.td

import scala.collection.mutable

/** Result of one shortcut-maintenance pass.
  *
  * @param affected       owners whose shortcut array changed (input to the
  *                       top-down label update, deduplicated)
  * @param deferredSlots  encoded slots whose owner failed the caller's
  *                       filter (e.g. overlay-owned slots during a
  *                       partition-parallel pass); feed to a later pass
  * @param overlayChanges boundary-boundary pairs whose *phase-1* value
  *                       (contraction of non-boundary vertices only,
  *                       Theorem 2) changed — these are input-edge changes
  *                       for the overlay index
  */
final case class ShortcutUpdateResult(
    affected: Array[Int],
    deferredSlots: Array[Long],
    overlayChanges: IndexedSeq[(Int, Int, Int)],
)

/** DCH-style bottom-up shortcut maintenance [32] over a [[TD]].
  *
  * Each slot (v, bag(v)(i)) obeys
  * `sc = min(base, min_w∈supporters sc(w,v)+sc(w,x))`; an input-edge change
  * seeds its slot, and slots are recomputed in ascending owner-rank order,
  * propagating to the (higher-ranked) pairs inside the owner's bag — the
  * shortcut-centric paradigm. Encoded slots are `rank(owner) << 20 | slot`.
  *
  * Like DCH's shortcut supporting graph, each slot remembers which
  * provider (the base edge or one supporter vertex) currently attains the
  * min, so a touched slot is usually an O(1) check: a full supporter
  * rescan is needed only when the attaining provider itself increased.
  *
  * With `boundaryFlag` set (PMHL partition indexes), the phase-1 value of
  * boundary-boundary slots — min over *non-boundary* supporters only — is
  * tracked as well, and its changes are reported as `overlayChanges`
  * (they are the overlay graph's input-edge updates).
  */
final class ShortcutUpdater(val td: TD, boundaryFlag: Array[Boolean] = null) {
  import TD.Inf

  private val trackOverlay = boundaryFlag != null
  /** Base-edge provider marker in argmin arrays. */
  private val Base = -1
  /** Cause marker for slots whose changed provider is unknown (deferred
    * re-entries from a partition-parallel pass): forces a full rescan.
    */
  private val Rescan = -2

  /** Current min provider per slot: `Base` or a supporter vertex id. */
  private val argmin: Array[Array[Int]] = Array.tabulate(td.n) { v =>
    val bg = td.bag(v)
    Array.tabulate(bg.length) { i =>
      var m = td.base(v)(i); var arg = Base
      val sups = td.supporters(v)(i)
      var j = 0
      while (j < sups.length) {
        val w = sups(j)
        val c = td.scOf(w, v) + td.scOf(w, bg(i))
        if (c < m) { m = c; arg = w }
        j += 1
      }
      require(m == td.sc(v)(i), s"sc invariant broken at ($v,${bg(i)})")
      arg
    }
  }

  /** Phase-1 values for boundary-boundary slots, aligned with td.bag. */
  private val ovVal: Array[Array[Int]] =
    if (!trackOverlay) null
    else Array.tabulate(td.n) { v =>
      if (!boundaryFlag(v)) Array.emptyIntArray
      else td.bag(v).indices.map { i =>
        if (boundaryFlag(td.bag(v)(i))) phase1Value(v, i) else Inf
      }.toArray
    }

  private def phase1Value(o: Int, slot: Int): Int = {
    val b = td.bag(o)(slot)
    var m = td.base(o)(slot)
    val sups = td.supporters(o)(slot)
    var i = 0
    while (i < sups.length) {
      val w = sups(i)
      if (!boundaryFlag(w)) {
        val s = td.scOf(w, o) + td.scOf(w, b)
        if (s < m) m = s
      }
      i += 1
    }
    m
  }

  /** Current phase-1 boundary graph (overlay input edges) of this index. */
  def overlayInputEdges(): IndexedSeq[(Int, Int, Int)] = {
    require(trackOverlay, "no boundary flags")
    val out = new mutable.ArrayBuffer[(Int, Int, Int)]()
    var v = 0
    while (v < td.n) {
      if (boundaryFlag(v)) {
        var i = 0
        while (i < td.bag(v).length) {
          if (boundaryFlag(td.bag(v)(i))) out += ((v, td.bag(v)(i), ovVal(v)(i)))
          i += 1
        }
      }
      v += 1
    }
    out.toIndexedSeq
  }

  private def encode(owner: Int, slot: Int): Long = (td.rank(owner).toLong << 20) | slot.toLong
  private def decodeOwner(e: Long): Int = td.order((e >>> 20).toInt)
  private def decodeSlot(e: Long): Int = (e & 0xfffffL).toInt

  /** Write new input-edge weights into `base` and return the seed slots. */
  def seed(changes: Iterable[(Int, Int, Int)]): IndexedSeq[Long] = {
    val out = new mutable.ArrayBuffer[Long]()
    changes.foreach { case (u, v, w) =>
      val o = td.pairOwner(u, v)
      val x = if (o == u) v else u
      val slot = td.slotOf(o, x)
      require(slot >= 0, s"input edge ($u,$v) has no slot")
      if (td.base(o)(slot) != w) {
        td.base(o)(slot) = w
        out += encode(o, slot)
      }
    }
    out.toIndexedSeq
  }

  /** Recompute seeded slots bottom-up; propagate while `ownerFilter` admits
    * the owner, deferring the rest. Single pass must see seeds for all
    * admissible owners up front (propagation only moves rank-upward).
    */
  // Per-slot scratch reused across process() calls: hash maps per touched
  // slot would dominate millisecond-scale update stages. Epoch stamps make
  // reuse O(1); concurrent calls (PostMHL partition-parallel U-Stage 2)
  // touch disjoint owners, so per-owner rows have a single writer.
  private val causesStore = new Array[Array[mutable.ArrayBuffer[Int]]](td.n)
  private val queuedEpoch = new Array[Array[Int]](td.n)
  private val epochCounter = new java.util.concurrent.atomic.AtomicInteger(0)

  def process(seeds: IndexedSeq[Long],
              ownerFilter: Int => Boolean = _ => true,
              rescanSeeds: IndexedSeq[Long] = IndexedSeq.empty): ShortcutUpdateResult = {
    val epoch = epochCounter.incrementAndGet()
    val pq = new java.util.PriorityQueue[java.lang.Long]()
    val deferred = new mutable.ArrayBuffer[Long]()
    val deferredSet = new mutable.HashSet[Long]()
    val affected = new mutable.ArrayBuffer[Int]()
    val affectedSet = new mutable.HashSet[Int]()
    val overlayChanges = new mutable.ArrayBuffer[(Int, Int, Int)]()

    def push(e: Long, cause: Int): Unit = {
      val o = decodeOwner(e)
      if (ownerFilter(o)) {
        val s = decodeSlot(e)
        if (queuedEpoch(o) == null) {
          queuedEpoch(o) = new Array[Int](td.bag(o).length)
          causesStore(o) = new Array[mutable.ArrayBuffer[Int]](td.bag(o).length)
        }
        if (queuedEpoch(o)(s) != epoch) {
          queuedEpoch(o)(s) = epoch
          if (causesStore(o)(s) == null) causesStore(o)(s) = new mutable.ArrayBuffer[Int](4)
          else causesStore(o)(s).clear()
          pq.add(e)
        }
        causesStore(o)(s) += cause
      } else if (deferredSet.add(e)) deferred += e
    }
    seeds.foreach(push(_, Base))
    rescanSeeds.foreach(push(_, Rescan))

    while (!pq.isEmpty) {
      val e = pq.poll().longValue()
      val o = decodeOwner(e); val slot = decodeSlot(e)
      val b = td.bag(o)(slot)
      val cs = causesStore(o)(slot)
      val old = td.sc(o)(slot)
      val am = argmin(o)(slot)

      def contribution(p: Int): Int =
        if (p == Base) td.base(o)(slot) else td.scOf(p, o) + td.scOf(p, b)

      var best = old; var bestArg = am
      var argminIncreased = false
      var mustRescan = false
      var ovTouched = false
      var ci = 0
      while (ci < cs.length) {
        val p = cs(ci)
        if (p == Rescan) { mustRescan = true; ovTouched = true }
        else {
          val c = contribution(p)
          if (c < best) { best = c; bestArg = p }
          if (p == am && c > old) argminIncreased = true
          if (trackOverlay && (p == Base || !boundaryFlag(p))) ovTouched = true
        }
        ci += 1
      }
      if (mustRescan || (best >= old && argminIncreased)) {
        // the attaining provider went up — full rescan for the new min
        best = td.base(o)(slot); bestArg = Base
        val sups = td.supporters(o)(slot)
        var j = 0
        while (j < sups.length) {
          val w = sups(j)
          val c = td.scOf(w, o) + td.scOf(w, b)
          if (c < best) { best = c; bestArg = w }
          j += 1
        }
      }
      if (trackOverlay && ovTouched && boundaryFlag(o) && boundaryFlag(b)) {
        val nov = phase1Value(o, slot)
        if (nov != ovVal(o)(slot)) { ovVal(o)(slot) = nov; overlayChanges += ((o, b, nov)) }
      }
      argmin(o)(slot) = bestArg
      if (best != old) {
        td.sc(o)(slot) = best
        if (affectedSet.add(o)) affected += o
        // The changed entry supports every pair (b, c) inside o's bag.
        val bg = td.bag(o)
        var j = 0
        while (j < bg.length) {
          if (j != slot) {
            val c = bg(j)
            val ow2 = td.pairOwner(b, c)
            val other = if (ow2 == b) c else b
            val s2 = td.slotOf(ow2, other)
            require(s2 >= 0, s"pair ($b,$c) has no slot")
            push(encode(ow2, s2), o)
          }
          j += 1
        }
      }
    }
    ShortcutUpdateResult(affected.toArray, deferred.toArray, overlayChanges.toIndexedSeq)
  }

  /** Convenience: seed + full single-threaded pass. */
  def applyInputChanges(changes: Iterable[(Int, Int, Int)]): ShortcutUpdateResult =
    process(seed(changes))
}
