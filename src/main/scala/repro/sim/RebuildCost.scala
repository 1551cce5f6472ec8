package repro.sim

import repro.baseline.DiskAnnLite
import repro.core.LireConfig
import repro.core.engine.SpFreshEngine
import repro.data.VectorGen
import repro.metrics.ResourceModel

/** Table 1 reproduction: the resource cost of a *global rebuild* (what
  * DiskANN's streamingMerge and SPANN's periodic reconstruction pay) versus
  * SPFresh's *incremental* maintenance of the same update volume.
  *
  * Wall-clock is measured on this machine at reproduction scale; memory is
  * the byte-level model of what each system must hold resident during the
  * operation (a rebuild materializes the full working set — raw vectors
  * plus the structure under construction — while SPFresh touches only its
  * steady-state metadata).
  */
object RebuildCost {

  final case class CostRow(system: String, operation: String, wallMs: Long,
                           peakModelMemMb: Double, cores: Int)

  final case class CostConfig(
      dim: Int = 32,
      n: Int = 10000,
      updateRate: Double = 0.01,
      nClusters: Int = 16,
      seed: Long = 3,
      lire: LireConfig = LireConfig(splitLimit = 128, mergeThreshold = 16,
        reassignRange = 16, searchProbes = 16),
  )

  def measure(cfg: CostConfig): Seq[CostRow] = {
    val mix = VectorGen.mixture(cfg.dim, cfg.nClusters, cfg.seed)
    val base = VectorGen.draw(mix, cfg.n, 0, cfg.seed + 1)
    val rawBytes = cfg.n.toLong * cfg.dim * 4

    // DiskANN global rebuild over the full dataset.
    val ann = new DiskAnnLite(cfg.dim, seed = cfg.seed)
    System.gc() // fence off allocation noise before each timed section
    val t0 = System.nanoTime()
    ann.build(base.map(v => (v.id, v.vec)))
    val annMs = (System.nanoTime() - t0) / 1000000
    // A rebuild holds raw vectors + old graph + new graph (merging spike).
    val annMem = ResourceModel.mb(ann.modelBytes(merging = true) + rawBytes)

    // SPANN global build (hierarchical balanced clustering + posting write).
    val spann = new SpFreshEngine(cfg.dim, cfg.lire, seed = cfg.seed)
    System.gc()
    val t1 = System.nanoTime()
    spann.buildInitial(base.map(v => (v.id, v.vec)))
    val spannMs = (System.nanoTime() - t1) / 1000000
    val spannMem = ResourceModel.mb(spann.modelBytes + rawBytes)

    // SPFresh incremental: one 1%-update epoch on an already-built index.
    val fresh = new SpFreshEngine(cfg.dim, cfg.lire, seed = cfg.seed)
    fresh.buildInitial(base.map(v => (v.id, v.vec)))
    val pool = VectorGen.shifted(mix, cfg.seed + 2)
    val (dels, ins) = VectorGen.epoch(base.map(_.id), pool, cfg.updateRate,
      cfg.n.toLong, cfg.seed + 3)
    System.gc()
    val t2 = System.nanoTime()
    dels.foreach(fresh.delete)
    ins.foreach(v => fresh.insert(v.id, v.vec))
    fresh.drainJobs()
    val freshMs = (System.nanoTime() - t2) / 1000000
    val freshMem = ResourceModel.mb(fresh.modelBytes)

    Seq(
      CostRow("DiskANN", "global rebuild", annMs, annMem, 1),
      CostRow("SPANN", "global rebuild", spannMs, spannMem, 1),
      CostRow("SPFresh", s"incremental epoch (${cfg.updateRate * 100}% updates)",
        freshMs, freshMem, 1),
    )
  }

  def render(rows: Seq[CostRow]): String = {
    val header = f"${"system"}%-8s | ${"operation"}%-32s | ${"wall ms"}%8s | ${"model mem MB"}%12s | cores"
    (header +: rows.map { r =>
      f"${r.system}%-8s | ${r.operation}%-32s | ${r.wallMs}%8d | ${r.peakModelMemMb}%12.2f | ${r.cores}%5d"
    }).mkString("\n")
  }
}
