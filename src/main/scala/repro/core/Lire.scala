package repro.core

import repro.core.VectorMath.sqDist

/** The LIRE protocol's pure decision rules (§3.2–§3.3 of the paper).
  *
  * These are shared verbatim by the single-node engine
  * ([[repro.core.engine.SpFreshEngine]]) and the Spark distributed index
  * ([[repro.core.distributed]]): both call into the same two *necessary
  * conditions* so their rebalancing behavior is identical by construction.
  */
object Lire {

  /** Equation (1): a vector `v` that lived in the split posting (old
    * centroid `oldC`) must be *checked* for reassignment iff the deleted
    * centroid is still at least as close as both new centroids. If a new
    * centroid beat the old one, NPA of `v` w.r.t. every other posting is
    * implied by the pre-split NPA state, so no check is needed.
    */
  def condition1(v: Array[Float], oldC: Array[Float], newCs: Seq[Array[Float]]): Boolean = {
    val dOld = sqDist(v, oldC)
    newCs.forall(c => dOld <= sqDist(v, c))
  }

  /** Equation (2): a vector `v` in a *nearby* posting must be checked iff at
    * least one new centroid moved closer than the deleted old centroid —
    * only then can a new posting possibly beat `v`'s current one.
    */
  def condition2(v: Array[Float], oldC: Array[Float], newCs: Seq[Array[Float]]): Boolean = {
    val dOld = sqDist(v, oldC)
    newCs.exists(c => sqDist(v, c) <= dOld)
  }

  /** Split trigger (§3.2): posting length after GC exceeds the limit. */
  def needsSplit(liveLen: Int, cfg: LireConfig): Boolean = liveLen > cfg.splitLimit

  /** Merge trigger (§3.2): posting shrank below the minimum length. */
  def needsMerge(liveLen: Int, cfg: LireConfig): Boolean = liveLen < cfg.mergeThreshold

  /** Final NPA check executed at reassignment time (§3.3, false-positive
    * elimination): the move proceeds only when the newly found nearest
    * centroid is strictly closer than the vector's current one.
    */
  def reassignImproves(v: Array[Float], currentC: Array[Float], bestC: Array[Float]): Boolean =
    sqDist(v, bestC) < sqDist(v, currentC)
}
