package repro.bench

import repro.core.{Monoid, Swag}
import repro.core.baseline.{Amta, DeamortizedTwoStacks, TwoStacksLite}
import repro.core.fiba.{BFiba, NbFiba}

/** Algorithm roster used across the benchmarks — the same set the paper
  * compares (§7): b_fiba{4,8}, nb_fiba{4,8}, amta, twostacks_lite, and
  * our daba_lite stand-in. In-order-only algorithms are excluded from
  * out-of-order experiments, exactly as in the paper's figures.
  */
object Algos {

  /** Factories for the full roster (in-order experiments). */
  def all[V](m: Monoid[V]): Seq[() => Swag[V]] = Seq(
    () => new BFiba[V](4, m),
    () => new BFiba[V](8, m),
    () => new NbFiba[V](4, m),
    () => new NbFiba[V](8, m),
    () => new Amta[V](m),
    () => new TwoStacksLite[V](m),
    () => new DeamortizedTwoStacks[V](m),
  )

  /** Out-of-order-capable subset (Figs 9, 13, 14, 16). */
  def ooo[V](m: Monoid[V]): Seq[() => Swag[V]] = Seq(
    () => new BFiba[V](4, m),
    () => new BFiba[V](8, m),
    () => new NbFiba[V](4, m),
    () => new NbFiba[V](8, m),
  )

  /** Memory-management ablation variants (Fig 10). */
  def memAblation[V](m: Monoid[V]): Seq[() => Swag[V]] = Seq(
    () => new BFiba[V](4, m, useFreeList = true),
    () => new BFiba[V](4, m, useFreeList = false, nameSuffix = "_nofl"),
    () => new BFiba[V](8, m, useFreeList = true),
    () => new BFiba[V](8, m, useFreeList = false, nameSuffix = "_nofl"),
  )
}
