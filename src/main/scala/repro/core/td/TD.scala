package repro.core.td

/** Tree decomposition of a weighted graph produced by minimum-degree
  * elimination (MDE, Definition 1 / §II of the paper).
  *
  * Per vertex `v` (a tree node `X(v)`):
  *  - `bag(v)`    — `X(v).N`: neighbors of `v` in the contracted graph at
  *                  `v`'s elimination, sorted by rank DESCENDING, so the
  *                  parent (lowest-rank bag member) is the LAST element;
  *  - `sc(v)`     — `X(v).sc`: shortcut weights aligned with `bag(v)` (this
  *                  is exactly the CH shortcut index per Lemma 4);
  *  - `base(v)`   — input-edge weight of each (v, bag member) pair in the
  *                  decomposed graph, or `Inf` if the pair arose purely from
  *                  contraction (needed for dynamic maintenance);
  *  - `supporters(v)(i)` — vertices `w` eliminated before `v` with both `v`
  *                  and `bag(v)(i)` in `X(w)` — the pairs whose shortcut
  *                  `sc(w,v)+sc(w,bag(v)(i))` supports this slot (the DCH
  *                  "shortcut supporting graph" [32]).
  *
  * The invariant maintained by construction and by [[ShortcutUpdater]]:
  * `sc(v)(i) == min(base(v)(i), min_w sc(w,v)+sc(w,bag(v)(i)))`.
  *
  * The tree may be a forest if the input graph is disconnected; `parent`
  * is -1 for roots and LCA queries across components return -1.
  */
final class TD(
    val n: Int,
    val rank: Array[Int],
    val order: Array[Int],
    val parent: Array[Int],
    val children: Array[Array[Int]],
    val depth: Array[Int],
    val bag: Array[Array[Int]],
    val sc: Array[Array[Int]],
    val base: Array[Array[Int]],
    val supporters: Array[Array[Array[Int]]],
    val roots: Array[Int],
) {
  import TD.Inf

  /** Current shortcut weight of pair (w, x); `Inf` if x not in bag(w). */
  def scOf(w: Int, x: Int): Int = {
    val b = bag(w)
    var i = 0
    while (i < b.length) { if (b(i) == x) return sc(w)(i); i += 1 }
    Inf
  }

  /** Slot index of x in bag(w), or -1. */
  def slotOf(w: Int, x: Int): Int = {
    val b = bag(w)
    var i = 0
    while (i < b.length) { if (b(i) == x) return i; i += 1 }
    -1
  }

  /** Owner of pair (a, b) = the lower-rank endpoint (its bag holds the slot). */
  def pairOwner(a: Int, b: Int): Int = if (rank(a) < rank(b)) a else b

  /** Tree height (max depth + 1). */
  lazy val height: Int = if (n == 0) 0 else depth.max + 1

  /** Treewidth proxy: max bag size. */
  lazy val maxBagSize: Int = if (n == 0) 0 else bag.map(_.length).max

  /** Total number of shortcut slots (the CH index size). */
  lazy val slotCount: Long = bag.map(_.length.toLong).sum

  // ---- LCA via Euler tour + sparse table (O(1) query) ----
  private var eulerFirst: Array[Int] = _
  private var sparse: Array[Array[Int]] = _
  private var eulerDepth: Array[Int] = _
  private var eulerVert: Array[Int] = _
  private var logs: Array[Int] = _
  private var comp: Array[Int] = _

  /** Build LCA structures (idempotent; called lazily by `lca`). */
  def buildLca(): Unit = synchronized {
    if (eulerFirst != null) return
    val first = Array.fill(n)(-1)
    val dep = new Array[Int](2 * n)
    val ver = new Array[Int](2 * n)
    val cmp = new Array[Int](n)
    var pos = 0
    var ci = 0
    for (r <- roots) {
      // Iterative Euler tour: push (vertex, childIdx).
      val stV = new java.util.ArrayDeque[Int]()
      val stI = new java.util.ArrayDeque[Int]()
      stV.push(r); stI.push(0)
      first(r) = pos; ver(pos) = r; dep(pos) = depth(r); pos += 1
      cmp(r) = ci
      while (!stV.isEmpty) {
        val v = stV.peek(); val i = stI.pop()
        if (i < children(v).length) {
          stI.push(i + 1)
          val c = children(v)(i)
          cmp(c) = ci
          stV.push(c); stI.push(0)
          first(c) = pos; ver(pos) = c; dep(pos) = depth(c); pos += 1
        } else {
          stV.pop()
          if (!stV.isEmpty) { ver(pos) = stV.peek(); dep(pos) = depth(stV.peek()); pos += 1 }
        }
      }
      ci += 1
    }
    val sz = pos
    val lg = new Array[Int](sz + 1)
    var i = 2
    while (i <= sz) { lg(i) = lg(i / 2) + 1; i += 1 }
    val levels = lg(math.max(sz, 1)) + 1
    val sp = new Array[Array[Int]](levels)
    sp(0) = java.util.Arrays.copyOf((0 until sz).toArray, sz)
    var k = 1
    while (k < levels) {
      val half = 1 << (k - 1)
      val prev = sp(k - 1)
      val cur = new Array[Int](math.max(0, sz - (1 << k) + 1))
      var j = 0
      while (j < cur.length) {
        val a = prev(j); val b = prev(j + half)
        cur(j) = if (dep(a) <= dep(b)) a else b
        j += 1
      }
      sp(k) = cur
      k += 1
    }
    eulerFirst = first; sparse = sp; eulerDepth = dep; eulerVert = ver; logs = lg; comp = cmp
  }

  /** Lowest common ancestor of s and t; -1 if in different components. */
  def lca(s: Int, t: Int): Int = {
    if (eulerFirst == null) buildLca()
    if (comp(s) != comp(t)) return -1
    var l = eulerFirst(s); var r = eulerFirst(t)
    if (l > r) { val tmp = l; l = r; r = tmp }
    val k = logs(r - l + 1)
    val a = sparse(k)(l); val b = sparse(k)(r - (1 << k) + 1)
    eulerVert(if (eulerDepth(a) <= eulerDepth(b)) a else b)
  }

  /** Is `a` an ancestor of (or equal to) `v`? O(depth) parent walk. */
  def isAncestorOrSelf(a: Int, v: Int): Boolean = {
    var x = v
    while (x != -1 && depth(x) >= depth(a)) {
      if (x == a) return true
      x = parent(x)
    }
    false
  }

  /** Ancestor chain of v from root (depth 0) down to v inclusive. */
  def ancestorChain(v: Int): Array[Int] = {
    val res = new Array[Int](depth(v) + 1)
    var x = v
    while (x != -1) { res(depth(x)) = x; x = parent(x) }
    res
  }
}

object TD {
  /** "Infinite" distance guard; small enough that a few additions can't overflow Int. */
  val Inf: Int = Int.MaxValue / 4
}
