package repro.core.fiba

import scala.collection.mutable.ArrayBuffer

/** One node of the FiBA finger B-tree (§3.2).
  *
  * Entries are parallel `times`/`values` arrays; non-leaf nodes have
  * `children.length == times.length + 1`. `agg` is the node's
  * location-sensitive partial aggregate: up aggregate Π↑ for non-spine
  * non-root nodes, left aggregate Π↙ on the left spine, right aggregate
  * Π↘ on the right spine, inner aggregate Π̂ at the root — see
  * `FibaBase` for the formulas.
  */
final class FibaNode[V](var isLeaf: Boolean) {
  val times: ArrayBuffer[Long]            = ArrayBuffer.empty
  val values: ArrayBuffer[V]              = ArrayBuffer.empty
  val children: ArrayBuffer[FibaNode[V]]  = ArrayBuffer.empty
  var parent: FibaNode[V]                 = null
  var leftSpine  = false
  var rightSpine = false
  var agg: V = _

  def entries: Int = times.length

  /** B-tree arity: child count for internal nodes, entries+1 for leaves. */
  def arity: Int = if (isLeaf) times.length + 1 else children.length

  /** Index of the first entry with time >= t (t's lower bound). */
  def lowerBound(t: Long): Int = {
    var lo = 0; var hi = times.length
    while (lo < hi) {
      val mid = (lo + hi) >>> 1
      if (times(mid) < t) lo = mid + 1 else hi = mid
    }
    lo
  }

  /** Number of entries with time <= t (the local eviction count). */
  def evictCount(t: Long): Int = lowerBound(t + 1)

  /** Reset to a blank leaf for reuse from the node pool. */
  def reset(): Unit = {
    times.clear(); values.clear(); children.clear()
    parent = null; leftSpine = false; rightSpine = false
    isLeaf = true
    agg = null.asInstanceOf[V]
  }

  override def toString: String = {
    val kind = if (isLeaf) "leaf" else s"node(${children.length}ch)"
    val fl = (if (leftSpine) "L" else "") + (if (rightSpine) "R" else "")
    s"$kind$fl[${times.mkString(",")}]"
  }
}
