package repro.storage

import java.nio.file.Path

import repro.core.LireConfig
import repro.core.engine.SpFreshEngine

/** Crash-recovery orchestration (§4.4): snapshot + WAL replay.
  *
  * Usage: call [[takeSnapshot]] periodically (it also truncates the covered
  * WAL and releases the older pre-release generation); after a "crash"
  * (engine object discarded; the [[BlockController]] device object and the
  * files survive) call [[recover]] to rebuild an equivalent engine.
  */
object Recovery {

  /** Capture the engine's in-memory structures into `snapPath`. The block
    * controller enters snapshot-guard mode on the first call so the blocks
    * this snapshot references can never be overwritten before the next one.
    */
  def takeSnapshot(engine: SpFreshEngine, snapPath: Path, walPath: Path): Unit = {
    engine.store.enableSnapshotGuard()
    val (cs, nextPid) = engine.centroidState()
    val snap = Snapshot(
      dim = engine.dim,
      nextPid = nextPid,
      centroids = cs,
      versions = engine.versions.snapshot(),
      blockMapping = engine.store.snapshotMapping(),
    )
    Snapshot.write(snap, snapPath)
    engine.store.onSnapshotTaken()
    Wal.truncate(walPath) // §4.4: "the WAL will be deleted when a new snapshot is generated"
  }

  /** Rebuild an engine from the latest snapshot plus the surviving device,
    * then replay the WAL of updates that followed the snapshot.
    */
  def recover(
      device: BlockController,
      snapPath: Path,
      walPath: Path,
      cfg: LireConfig,
      rebalanceEnabled: Boolean = true,
      seed: Long = 0,
  ): SpFreshEngine = {
    val snap = Snapshot.read(snapPath)
    device.restoreMapping(snap.blockMapping)
    device.enableSnapshotGuard()
    val engine = new SpFreshEngine(
      snap.dim, cfg, rebalanceEnabled = rebalanceEnabled, seed = seed,
      attachedStore = Some(device))
    engine.restoreCentroids(snap.centroids, snap.nextPid)
    engine.versions.restore(snap.versions)
    Wal.replay(walPath).foreach {
      case WalInsert(vid, vec) => engine.insert(vid, vec)
      case WalDelete(vid)      => engine.delete(vid)
    }
    engine.drainJobs()
    engine
  }
}
