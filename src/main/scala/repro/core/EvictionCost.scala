package repro.core

/** Expected page-eviction cost model (Sec. 6, Eq. 6/7).
  *
  * A victim locality set is the one whose next-evicted page has the lowest
  * `c_w + p_reuse * c_r`; the dedup-aware contribution is estimating the
  * reuse probability from the superposition of per-model Poisson access
  * processes over ALL models sharing the page.
  */
object EvictionCost {

  /** Eq. 7: probability that a page shared by models with access rates
    * `rates` (accesses per time tick) is touched within `t` ticks.
    */
  def pReuse(rates: Iterable[Double], t: Double): Double = {
    require(t >= 0, "horizon must be non-negative")
    require(rates.forall(_ >= 0), "rates must be non-negative")
    1.0 - math.exp(-rates.sum * t)
  }

  /** Eq. 6: expected eviction cost. `cw` is zero for clean pages. */
  def expected(cw: Double, cr: Double, pReuse: Double): Double = {
    require(pReuse >= 0 && pReuse <= 1, s"pReuse out of range: $pReuse")
    cw + pReuse * cr
  }
}
