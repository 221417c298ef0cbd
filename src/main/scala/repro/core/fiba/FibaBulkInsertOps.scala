package repro.core.fiba

import scala.collection.mutable.ArrayBuffer

/** Bulk insertion (§5): amortized O(log d + m(1 + log(d/m))).
  *
  * Three steps:
  *  1. *insertion-sites search*: locate each bulk entry's target node in
  *     timestamp order; consecutive searches only climb to the least
  *     common ancestor of successive sites. Entries whose timestamp
  *     already exists are combined immediately and become recomputation
  *     treelets riding from the leaf level; new timestamps become
  *     insertion treelets at their leaf.
  *  2. *pass up — interleave & split*: level by level, gather each
  *     target's treelets, merge them into the node (the merge step of
  *     merge sort), and `bulkSplit` any overflowed node into arity-(µ+1)
  *     nodes plus one arity-[µ,2µ] node (Claim 1), promoting separators
  *     as next-level treelets — which stay timestamp-sorted for free.
  *  3. *pass down* the touched spines, repairing Π↙/Π↘ and flags; the
  *     highest spine node touched per side starts the walk, so in-order
  *     bulks never pay more than the treelet height.
  */
trait FibaBulkInsertOps[V] { self: FibaBase[V] with FibaSingleOps[V] =>

  /** One pending event for the pass up. `child` (if non-null) splices in
    * immediately right of the inserted entry. `targetLevel` is the height
    * of `target` above the leaves (0 = leaf); recompute-only events ride
    * along until their level is reached.
    */
  private final class Treelet(
      val target: FibaNode[V],
      val time: Long,
      val value: V,
      val child: FibaNode[V],
      val targetLevel: Int,
      val isRecompute: Boolean,
  )

  /** Insert a timestamp-ordered bulk (strictly increasing within the
    * bulk); values colliding with existing timestamps are combined.
    */
  final def bulkInsertNative(entries: IndexedSeq[(Long, V)]): Unit = {
    if (entries.isEmpty) return
    if (entries.length == 1) { // "small insertion" (§6): no treelet machinery
      insertOne(entries(0)._1, entries(0)._2)
      return
    }
    if (isEmpty) { // empty window: plain appends, d = 0
      var i = 0
      while (i < entries.length) { insertOne(entries(i)._1, entries(i)._2); i += 1 }
      return
    }

    // ---- Step 1: insertion-sites search (successor-style LCA hopping).
    var current = new ArrayBuffer[Treelet](entries.length)
    var prevSite: FibaNode[V] = null
    var i = 0
    while (i < entries.length) {
      val (t, v) = entries(i)
      require(i == 0 || t > entries(i - 1)._1, "bulk must be strictly increasing in time")
      // Appends (the common in-order case) go straight through the right
      // finger in O(1); other entries hop to the LCA of consecutive sites.
      var cur: FibaNode[V] =
        if (prevSite == null || t > rightFinger.times.last) fingerSearchTop(t)
        else ascendToCover(prevSite, t)
      var placed = false
      while (!placed) {
        val idx = cur.lowerBound(t)
        if (idx < cur.entries && cur.times(idx) == t) {
          cur.values(idx) = monoid.combine(cur.values(idx), v) // combine now
          current += new Treelet(cur, t, v, null, levelOf(cur), isRecompute = true)
          placed = true
        } else if (cur.isLeaf) {
          current += new Treelet(cur, t, v, null, 0, isRecompute = false)
          placed = true
        } else cur = cur.children(idx)
      }
      prevSite = cur
      i += 1
    }

    // ---- Step 2: pass up, level by level.
    // Dirty markers are overwritten as levels ascend, so each ends at the
    // highest touched node of its kind — where the pass down starts.
    var dirtyLeftTop: FibaNode[V]  = null
    var dirtyRightTop: FibaNode[V] = null
    var rootDirty = false
    val rootAtStart = root
    var level = 0
    while (current.nonEmpty) {
      val next = new ArrayBuffer[Treelet](math.max(4, current.length / minArity))
      var j = 0
      while (j < current.length) {
        val head = current(j)
        if (head.targetLevel > level) { // ride along to its own level
          next += head
          j += 1
        } else {
          val target = head.target
          var k = j
          var hasInsert = false
          while (k < current.length && (current(k).target eq target) &&
                 current(k).targetLevel <= level) {
            if (!current(k).isRecompute) hasInsert = true
            k += 1
          }
          var lastPiece: FibaNode[V] = null
          if (hasInsert) {
            interleave(target, current, j, k)
            if (target.entries > maxEntries) {
              lastPiece = bulkSplitAndPromote(target, next, level)
            } else {
              markOrPropagate(target, head.time, next, level)
            }
          } else {
            markOrPropagate(target, head.time, next, level)
          }
          // spine bookkeeping: later (higher) levels overwrite, so each
          // marker ends at the highest touched node of its kind
          if (target.leftSpine) dirtyLeftTop = target
          if (target.rightSpine) dirtyRightTop = target
          if (lastPiece != null && lastPiece.rightSpine) dirtyRightTop = lastPiece
          if (target eq root) rootDirty = true
          j = k
        }
      }
      current = next
      level += 1
    }

    // ---- Step 3: pass down the touched spines. A grown root supersedes
    // all lower markers: both spines hang freshly off the new root.
    if (root ne rootAtStart) {
      rootDirty = true
      dirtyLeftTop = root.children.head
      dirtyRightTop = root.children.last
    }
    if (rootDirty) root.agg = innerAgg(root)
    if (dirtyLeftTop != null) repairLeftSpineFrom(dirtyLeftTop)
    if (dirtyRightTop != null) repairRightSpineFrom(dirtyRightTop)
  }

  /** Recompute the target's aggregate or defer it: non-spine nodes get a
    * fresh up aggregate and propagate a recomputation treelet to the
    * parent; spine/root nodes stop the upward propagation (their repair
    * happens in the pass down / root recompute via the dirty markers).
    */
  private def markOrPropagate(target: FibaNode[V], time: Long,
                              next: ArrayBuffer[Treelet], level: Int): Unit = {
    if ((target ne root) && !target.leftSpine && !target.rightSpine) {
      target.agg = upAgg(target)
      next += new Treelet(target.parent, time, monoid.identity, null, level + 1, isRecompute = true)
    }
  }

  /** Height of `n` above the leaf level. O(height). */
  private def levelOf(n: FibaNode[V]): Int = {
    var l = 0
    var cur = n
    while (!cur.isLeaf) { l += 1; cur = cur.children.head }
    l
  }

  /** Climb from `from` to the lowest node whose subtree covers `t`
    * (successor search: only up to the LCA of consecutive sites).
    */
  private def ascendToCover(from: FibaNode[V], t: Long): FibaNode[V] = {
    var cur = from
    while (cur ne root) {
      val p = cur.parent
      val slot = p.children.indexWhere(_ eq cur)
      if (slot < p.entries && t <= p.times(slot)) {
        // covered: the boundary entry itself lives in p
        return if (t == p.times(slot)) p else cur
      }
      cur = p
    }
    root
  }

  // ---- interleave & bulk split ----------------------------------------------

  /** Merge treelets [from, until) of `buf` (time-sorted, targeting
    * `node`) into the node's entry arrays; recompute treelets in the run
    * are skipped here (the caller refreshes aggregates). Children carried
    * by treelets splice in right of their entry. Linear in the combined
    * length — no sorting.
    */
  private def interleave(node: FibaNode[V], buf: ArrayBuffer[Treelet],
                         from: Int, until: Int): Unit = {
    val nT = new ArrayBuffer[Long](node.entries + (until - from))
    val nV = new ArrayBuffer[V](node.entries + (until - from))
    val nC = if (node.isLeaf) null else new ArrayBuffer[FibaNode[V]](node.children.length + (until - from))
    if (nC != null) nC += node.children.head
    var oi = 0    // original entry cursor
    var ti = from // treelet cursor
    while (oi < node.entries || ti < until) {
      if (ti < until && buf(ti).isRecompute) ti += 1
      else if (ti < until &&
               (oi >= node.entries || buf(ti).time < node.times(oi))) {
        val tl = buf(ti)
        nT += tl.time; nV += tl.value
        if (nC != null) { tl.child.parent = node; nC += tl.child }
        ti += 1
      } else {
        if (ti < until && buf(ti).time == node.times(oi))
          throw new AssertionError("bulk insert: collision not combined in step 1")
        nT += node.times(oi); nV += node.values(oi)
        if (nC != null) nC += node.children(oi + 1)
        oi += 1
      }
    }
    node.times.clear(); node.times ++= nT
    node.values.clear(); node.values ++= nV
    if (nC != null) { node.children.clear(); node.children ++= nC }
  }

  /** Split an overflowed node (entries > 2µ-1) into arity-(µ+1) pieces
    * plus a final arity-[µ,2µ] piece (Claim 1), appending the promoted
    * separators as insertion treelets for the parent (a fresh root is
    * grown first when `node` is the root). The node keeps the first piece
    * — preserving identity, left-spine flag, and left finger; the last
    * piece inherits the right-spine flag and finger. Non-spine pieces get
    * fresh up aggregates. Returns the last piece.
    */
  private def bulkSplitAndPromote(node: FibaNode[V], next: ArrayBuffer[Treelet],
                                  level: Int): FibaNode[V] = {
    val mu = minArity
    var grewRoot = false
    if (node eq root) {
      val nr = allocNode(leaf = false)
      nr.children += node
      node.parent = nr
      root = nr
      node.leftSpine = true
      if (node.isLeaf) leftFinger = node
      grewRoot = true
    }
    val parent = node.parent
    val wasRightSpine = node.rightSpine

    // piece sizes: q pieces of µ entries, one final piece of r entries
    val total = node.entries
    var r = total
    var q = 0
    while (r > maxEntries) { r -= (mu + 1); q += 1 }

    val allT = node.times.toIndexedSeq
    val allV = node.values.toIndexedSeq
    val allC: IndexedSeq[FibaNode[V]] = if (node.isLeaf) IndexedSeq.empty else node.children.toIndexedSeq
    node.times.clear(); node.values.clear(); node.children.clear()

    var cursor = 0  // entry cursor into allT/allV
    var cCursor = 0 // child cursor into allC
    var piece = node
    var last = node
    var pi = 0
    while (pi <= q) {
      val take = if (pi < q) mu else r
      var e = 0
      while (e < take) {
        piece.times += allT(cursor)
        piece.values += allV(cursor)
        cursor += 1; e += 1
      }
      if (!node.isLeaf) {
        var c = 0
        while (c < take + 1) {
          val ch = allC(cCursor)
          ch.parent = piece
          piece.children += ch
          cCursor += 1; c += 1
        }
      }
      last = piece
      pi += 1
      if (pi <= q) { // promote a separator and start the next piece
        val sepT = allT(cursor); val sepV = allV(cursor); cursor += 1
        val np = allocNode(node.isLeaf)
        next += new Treelet(parent, sepT, sepV, np, level + 1, isRecompute = false)
        piece = np
      }
    }

    // spine flags and fingers: the last piece inherits right-spine status
    // (a just-grown root's last piece becomes the right-spine top).
    if (wasRightSpine || grewRoot) {
      node.rightSpine = false
      last.rightSpine = true
      if (last.isLeaf && (wasRightSpine || grewRoot)) rightFinger = last
    }

    // Up aggregates for every non-spine piece. Spine pieces (the first on
    // the left spine, the last on the right spine) are repaired by the
    // pass down; their formulas never read a spine child's aggregate.
    if (!node.leftSpine && !node.rightSpine) node.agg = upAgg(node)
    var nTl = next.length - q
    while (nTl < next.length) {
      val pc = next(nTl).child
      if (!pc.leftSpine && !pc.rightSpine) pc.agg = upAgg(pc)
      nTl += 1
    }
    last
  }
}
