package repro.baseline

import repro.core.LireConfig
import repro.core.engine.SpFreshEngine

/** The paper's SPANN+ baseline (§5.1): "a modified version of SPANN which
  * appends updates locally to a posting *without splitting and reassigning*
  * — an append-only version of SPFresh without the Local Rebuilder".
  *
  * Realized as an [[SpFreshEngine]] with rebalancing disabled, so the two
  * systems share every other code path (storage, search, versions) and the
  * measured differences are attributable to LIRE alone.
  */
object SpannPlus {
  def apply(dim: Int, cfg: LireConfig = LireConfig(), seed: Long = 0): SpFreshEngine =
    new SpFreshEngine(dim, cfg, rebalanceEnabled = false, seed = seed)
}
