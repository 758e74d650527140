package repro.core

import repro.core.ExactCorrelation.Terms

/** Lemma 2 — incremental update of the query-window correlation when the
  * sliding window advances by one basic window (evict the oldest, append
  * the newest).
  *
  * All deltas are taken w.r.t. the *old* window's (size-weighted) grand
  * mean; the new grand mean shifts by α = (B_new·δ_new − B_old·δ_old)/T'
  * (the paper divides by T — a typo that is immaterial in its equal-size
  * experiments where T' = T; Lemma2Spec validates the T' form against
  * from-scratch recomputation for unequal sizes too).
  */
object IncrementalCorrelation {

  /** Slide the Lemma-1 terms one basic window forward.
    *
    * @param st     terms of the current query window (time t)
    * @param evictX sketch of the evicted (oldest) basic window of x
    * @param evictY sketch of the evicted basic window of y
    * @param cEvict c_1: per-window correlation of the evicted windows
    * @param addX   sketch of the arriving basic window of x
    * @param addY   sketch of the arriving basic window of y
    * @param cAdd   c_{n_s+1}: correlation of the arriving windows
    * @return       terms of the advanced query window (time t + B_new)
    */
  def slide(st: Terms,
            evictX: WindowStats, evictY: WindowStats, cEvict: Double,
            addX: WindowStats, addY: WindowStats, cAdd: Double): Terms = {
    require(evictX.size == evictY.size && addX.size == addY.size, "window sizes must align across series")
    val bOld = evictX.size.toDouble
    val bNew = addX.size.toDouble
    val tNew = st.t - evictX.size + addX.size
    // δ of the evicted / arriving windows w.r.t. the OLD grand mean.
    val dx1 = evictX.mean - st.grandMeanX; val dy1 = evictY.mean - st.grandMeanY
    val dxn = addX.mean - st.grandMeanX;   val dyn = addY.mean - st.grandMeanY
    val ax = (bNew * dxn - bOld * dx1) / tNew
    val ay = (bNew * dyn - bOld * dy1) / tNew
    val num = st.numerator +
      bNew * (addX.std * addY.std * cAdd + dxn * dyn) -
      bOld * (evictX.std * evictY.std * cEvict + dx1 * dy1) -
      tNew * ax * ay
    val vx = st.tVarX + bNew * (addX.variance + dxn * dxn) - bOld * (evictX.variance + dx1 * dx1) - tNew * ax * ax
    val vy = st.tVarY + bNew * (addY.variance + dyn * dyn) - bOld * (evictY.variance + dy1 * dy1) - tNew * ay * ay
    Terms(tNew, num, vx, vy, st.grandMeanX + ax, st.grandMeanY + ay)
  }

  /** Grow-only variant: append a new basic window without evicting (used
    * when bootstrapping a sliding window until it reaches n_s windows).
    * Derived from Lemma 2 with B_old = 0.
    */
  def append(st: Terms, addX: WindowStats, addY: WindowStats, cAdd: Double): Terms = {
    val bNew = addX.size.toDouble
    val tNew = st.t + addX.size
    val dxn = addX.mean - st.grandMeanX; val dyn = addY.mean - st.grandMeanY
    val ax = bNew * dxn / tNew; val ay = bNew * dyn / tNew
    val num = st.numerator + bNew * (addX.std * addY.std * cAdd + dxn * dyn) - tNew * ax * ay
    val vx = st.tVarX + bNew * (addX.variance + dxn * dxn) - tNew * ax * ax
    val vy = st.tVarY + bNew * (addY.variance + dyn * dyn) - tNew * ay * ay
    Terms(tNew, num, vx, vy, st.grandMeanX + ax, st.grandMeanY + ay)
  }
}
