package repro.core

/** The sliding-window aggregation abstract data type of §3.1.
  *
  * A window holds (timestamp, value) entries with strictly increasing
  * timestamps; inserting an existing timestamp combines the values with
  * the monoid (in window order: existing ⊗ new).
  *
  * `bulkEvict(t)` removes every entry with timestamp ≤ t.
  * `bulkInsert(entries)` inserts a timestamp-ordered bulk, interleaving
  * with the current window and combining on collisions.
  * The default bulk implementations loop over single operations — that is
  * exactly how the paper's non-bulk baselines (nb_fiba, twostacks, daba,
  * amta-without-bulk-insert) emulate bulks.
  */
trait Swag[V] {
  def monoid: Monoid[V]

  /** Algorithm label used in bench tables (e.g. "b_fiba4"). */
  def name: String

  /** True if the algorithm accepts inserts below the current max time. */
  def supportsOoo: Boolean

  /** Number of distinct timestamps currently in the window. */
  def size: Int

  /** Oldest timestamp, if nonempty. */
  def minTime: Option[Long]

  /** Youngest timestamp, if nonempty. */
  def maxTime: Option[Long]

  /** Monoidal combination of all window values in timestamp order. */
  def query(): V

  /** Insert a single (t, v); combines when t is already present. */
  def insert(t: Long, v: V): Unit

  /** Evict the single oldest entry; no-op on an empty window. */
  def evict(): Unit

  /** Remove all entries with timestamp ≤ t. */
  def bulkEvict(t: Long): Unit = {
    while (minTime.exists(_ <= t)) evict()
  }

  /** Insert a timestamp-ordered bulk (strictly increasing within bulk). */
  def bulkInsert(entries: IndexedSeq[(Long, V)]): Unit = {
    var i = 0
    while (i < entries.length) { insert(entries(i)._1, entries(i)._2); i += 1 }
  }

  /** Full window contents in timestamp order, if the algorithm can
    * enumerate them (FiBA and the brute-force reference can; the
    * aggregate-only stacks cannot). Used for streaming checkpoints.
    */
  def snapshot(): Option[IndexedSeq[(Long, V)]] = None
}
