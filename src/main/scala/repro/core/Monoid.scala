package repro.core

/** A monoid `(S, ⊗, 1)` — the aggregation algebra of §3.1.
  *
  * `combine` must be associative; it need not be commutative or
  * invertible, and every sliding-window algorithm in this repo must work
  * for the general (non-commutative, non-invertible) case. `identity`
  * gives meaning to the aggregate of an empty (sub)window.
  */
trait Monoid[V] extends Serializable {
  /** The neutral element 1. */
  def identity: V

  /** The associative combine operator ⊗. */
  def combine(x: V, y: V): V

  /** Human-readable name used in bench tables. */
  def name: String

  /** Fold a sequence left-to-right (timestamp order). */
  final def combineAll(vs: IterableOnce[V]): V =
    vs.iterator.foldLeft(identity)(combine)
}
