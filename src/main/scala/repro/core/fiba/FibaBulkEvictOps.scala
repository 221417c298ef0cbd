package repro.core.fiba

import scala.collection.mutable.ArrayBuffer

/** Bulk eviction (§4): amortized O(log m), worst-case O(log n).
  *
  * Three steps:
  *  1. a finger-based *eviction boundary search* up from the left finger
  *     to the lowest node `s` whose subtree holds every entry <= t, then
  *     down along the cut collecting (node, idx, neighbor, ancestor)
  *     triples — the neighbor may not be a sibling, and the ancestor is
  *     their least common ancestor holding the separating entry;
  *  2. a *pass up* the boundary doing local evictions (slicing whole
  *     evicted children off in one go, onto the deferred free list) and
  *     repairing arity underflow with batch moves (Fig 18), non-sibling
  *     merges (Fig 19), or tree shrinking (Figs 4/5), plus a repair loop
  *     beyond the boundary (shared with single evict);
  *  3. a *pass down* the new left spine (and the right spine when the cut
  *     reached it) repairing location-sensitive aggregates and flags.
  */
trait FibaBulkEvictOps[V] { self: FibaBase[V] with FibaSingleOps[V] =>

  // Reusable boundary-search scratch space, cleared at the start of each
  // bulkEvict call. Between calls it pins at most O(log n) node refs,
  // which the deferred free list would keep alive anyway.
  private val scratchNodes     = ArrayBuffer.empty[FibaNode[V]]
  private val scratchIdxs      = ArrayBuffer.empty[Int]
  private val scratchNeighbors = ArrayBuffer.empty[FibaNode[V]]
  private val scratchAncestors = ArrayBuffer.empty[FibaNode[V]]
  private val scratchAncLevels = ArrayBuffer.empty[Int]

  /** Remove every entry with timestamp <= t. */
  final def bulkEvictNative(t: Long): Unit = {
    if (isEmpty || t < leftFinger.times.head) return
    if (t >= rightFinger.times.last) { clearAll(); return }

    // Small-eviction fast paths (§6 spirit): no boundary bookkeeping when
    // the cut stays inside one leaf — the dominant case on real streams.
    if (root.isLeaf) {
      val idx = root.evictCount(t)
      root.times.remove(0, idx)
      root.values.remove(0, idx)
      root.agg = innerAgg(root)
      return
    }
    if (t < leftFinger.parent.times.head) {
      val idx = leftFinger.evictCount(t)
      if (leftFinger.entries - idx >= minArity - 1) { // no underflow at all
        leftFinger.times.remove(0, idx)
        leftFinger.values.remove(0, idx)
        repairLeftSpineFrom(leftFinger)
        return
      } else { // underflow: at most 2µ-1 single evictions — O(1) bounded
        var k = 0
        while (k < idx) { evictOldest(); k += 1 }
        return
      }
    }

    // ---- Step 1a: ascend from the left finger to the boundary top s.
    var s = leftFinger
    while ((s ne root) && t >= s.parent.times.head) s = s.parent

    // ---- Step 1b: descend along the cut, collecting boundary triples.
    // Scratch buffers are reused across calls (§6's alternating-buffer
    // spirit) — the boundary is O(log m) entries, allocated once.
    val nodes     = scratchNodes;     nodes.clear()
    val idxs      = scratchIdxs;      idxs.clear()
    val neighbors = scratchNeighbors; neighbors.clear()
    val ancestors = scratchAncestors; ancestors.clear()
    val ancLevels = scratchAncLevels; ancLevels.clear() // index into `nodes`; -1 = s.parent

    var cur = s
    var curNeighbor: FibaNode[V] = if (s eq root) null else s.parent.children(1)
    var curAncestor: FibaNode[V] = if (s eq root) null else s.parent
    var curAncLevel = -1
    var descending = true
    while (descending) {
      val idx = cur.evictCount(t)
      nodes += cur; idxs += idx
      neighbors += curNeighbor; ancestors += curAncestor; ancLevels += curAncLevel
      if (cur.isLeaf) descending = false
      else if (idx >= 1 && cur.times(idx - 1) == t) descending = false // exact hit: child idx survives whole
      else {
        val lvl = nodes.length - 1
        if (idx < cur.entries) {
          curNeighbor = cur.children(idx + 1)
          curAncestor = cur
          curAncLevel = lvl
        } else if (curNeighbor != null) {
          curNeighbor = curNeighbor.children.head
        }
        cur = cur.children(idx)
      }
    }

    // ---- Step 2: pass up — local evictions + arity repair.
    // (captured now: a merge whose ancestor is s.parent frees s, nulling
    // its parent pointer before step 3 would read it)
    val sParent = s.parent
    var newRootInstalled = false
    var poppedAbove      = false               // a merge popped s.parent
    var rightDirtyTop: FibaNode[V] = null      // a move drained a right-spine neighbor

    var l = nodes.length - 1
    var skipLocalEvict = false
    var done = false
    while (!done && l >= 0) {
      val node = nodes(l)
      val neighbor = neighbors(l)
      if (!skipLocalEvict) {
        val idx = idxs(l)
        var i = 0
        while (i < math.min(idx, node.children.length)) { freeNode(node.children(i)); i += 1 }
        if (!node.isLeaf) node.children.remove(0, idx)
        node.times.remove(0, idx)
        node.values.remove(0, idx)
      }
      skipLocalEvict = false

      if (node eq root) {
        if (!root.isLeaf && root.children.length == 1) { // Fig 5: make child root
          val old = root
          root = root.children.head
          old.children.clear()
          freeNode(old)
          newRootInstalled = true
        }
        done = true
      } else if (node.arity >= minArity) {
        l -= 1
      } else if (neighbor == null) {
        // Nothing survives to the right at any level above (only possible
        // when s is the root): the tree shrinks — Figs 4/5.
        if (!node.isLeaf && node.arity == 1) {
          root = node.children.head // make child root
          node.children.clear()
          // node stays attached under the dead upper path; freed with it
        } else {
          // make node root: detach it from the dead upper path first
          val p = node.parent
          val slot = p.children.indexWhere(_ eq node)
          p.children.remove(slot)
          root = node
        }
        freeNode(nodes(0)) // the old root and its whole remaining (dead) path
        newRootInstalled = true
        done = true
      } else {
        val ancestor = ancestors(l)
        val deficit = minArity - node.arity
        val surplus = neighbor.arity - minArity
        if (deficit <= surplus) {
          moveBatch(node, neighbor, ancestor, deficit)
          if (neighbor.rightSpine) rightDirtyTop = neighbor // repaired in step 3 / shrink repair
          else neighbor.agg = upAgg(neighbor)
          l -= 1
        } else {
          val a = mergeIntoNeighbor(node, neighbor, ancestor)
          // Eager ancestor pop: entries [0..a] (evicted + rotated separator)
          // and children [0..a] (evicted subtrees + the dead path chain).
          var i = 0
          while (i <= a) { freeNode(ancestor.children(i)); i += 1 }
          ancestor.children.remove(0, a + 1)
          ancestor.times.remove(0, a + 1)
          ancestor.values.remove(0, a + 1)
          val aLvl = ancLevels(l)
          if (aLvl < 0) { poppedAbove = true; done = true }
          else { l = aLvl; skipLocalEvict = true }
        }
      }
    }

    // ---- Step 3: pass down — spine aggregates, flags, fingers.
    if (newRootInstalled) {
      repairFromNewRoot()
    } else if (s eq root) {
      root.agg = innerAgg(root)
      if (!root.isLeaf) repairLeftSpineFrom(root.children.head)
      if (rightDirtyTop != null) repairRightSpineFrom(rightDirtyTop)
    } else {
      val replacedRoot =
        if (poppedAbove) leftRepairCascade(sParent)
        else if (sParent eq root) {
          root.agg = innerAgg(root)
          repairLeftSpineFrom(root.children.head)
          false
        } else {
          repairLeftSpineFrom(sParent)
          false
        }
      if (rightDirtyTop != null && !replacedRoot) repairRightSpineFrom(rightDirtyTop)
    }
  }

  /** Evict everything: reset to an empty root leaf. */
  protected final def clearAll(): Unit = {
    freeNode(root)
    root = allocNode(leaf = true)
    root.agg = monoid.identity
    leftFinger = root
    rightFinger = root
  }

  // ---- batch rebalancing primitives (paper Figs 18 & 19) -------------------

  /** Index of the separating entry in `ancestor`: the greatest i with
    * ancestor.times(i) < neighbor's first time.
    */
  private def separatorIndex(ancestor: FibaNode[V], neighbor: FibaNode[V]): Int = {
    var a = ancestor.entries - 1
    while (a >= 0 && ancestor.times(a) >= neighbor.times.head) a -= 1
    require(a >= 0, "bulk evict: no separator between node and neighbor")
    a
  }

  /** Fig 18 `moveBatch`: rotate the separator from the ancestor plus the
    * first k-1 entries (and k children) of the neighbor into `node`, and
    * rotate the neighbor's k-th entry up into the ancestor's separator
    * slot. Brings `node` back to MIN_ARITY without overflowing anyone.
    */
  protected final def moveBatch(node: FibaNode[V], neighbor: FibaNode[V],
                                ancestor: FibaNode[V], k: Int): Unit = {
    val a = separatorIndex(ancestor, neighbor)
    node.times += ancestor.times(a)
    node.values += ancestor.values(a)
    if (!node.isLeaf) {
      val c0 = neighbor.children.head
      c0.parent = node
      node.children += c0
    }
    var i = 0
    while (i < k - 1) {
      node.times += neighbor.times(i)
      node.values += neighbor.values(i)
      if (!node.isLeaf) {
        val c = neighbor.children(i + 1)
        c.parent = node
        node.children += c
      }
      i += 1
    }
    ancestor.times(a) = neighbor.times(k - 1)
    ancestor.values(a) = neighbor.values(k - 1)
    neighbor.times.remove(0, k)
    neighbor.values.remove(0, k)
    if (!neighbor.isLeaf) neighbor.children.remove(0, k)
  }

  /** Fig 19 `mergeNotSibling`: prepend what is left of `node` plus the
    * separating entry from the ancestor onto `neighbor`, emptying `node`.
    * Returns the separator index (the caller pops ancestor [0..a]).
    */
  protected final def mergeIntoNeighbor(node: FibaNode[V], neighbor: FibaNode[V],
                                        ancestor: FibaNode[V]): Int = {
    val a = separatorIndex(ancestor, neighbor)
    if (!node.isLeaf) {
      var i = 0
      while (i < node.children.length) { node.children(i).parent = neighbor; i += 1 }
      neighbor.children.insertAll(0, node.children)
    }
    neighbor.times.insert(0, ancestor.times(a))
    neighbor.values.insert(0, ancestor.values(a))
    neighbor.times.insertAll(0, node.times)
    neighbor.values.insertAll(0, node.values)
    node.times.clear(); node.values.clear(); node.children.clear()
    a
  }
}
