package repro.core.engine

import scala.collection.mutable

import repro.centroid.{BruteForceCentroidIndex, CentroidIndex}
import repro.cluster.{BalancedKMeans, HierarchicalBuild}
import repro.core.{Lire, LireConfig, VectorMath, VersionMap}
import repro.storage.{BlockController, IoDelta, VectorRecord}

/** Counters the benches report; they map to the paper's §5.2 observations
  * ("only 0.4% of insertions cause rebalancing … on average 5094 vectors
  * evaluated, 79 reassigned").
  */
final class EngineStats {
  var inserts: Long = 0
  var deletes: Long = 0
  var splitJobs: Long = 0
  var splitsExecuted: Long = 0
  var gcOnlySplits: Long = 0
  var merges: Long = 0
  var reassignChecked: Long = 0
  var reassignExecuted: Long = 0
  var reassignAborted: Long = 0
  var cascadeSplits: Long = 0

  override def toString: String =
    f"inserts=$inserts deletes=$deletes splitJobs=$splitJobs splits=$splitsExecuted " +
      f"gcOnly=$gcOnlySplits merges=$merges reassignChecked=$reassignChecked " +
      f"reassignExecuted=$reassignExecuted aborted=$reassignAborted cascades=$cascadeSplits"
}

/** Cost of one foreground operation, for the latency model. */
final case class OpCost(io: IoDelta, distComps: Long)

/** Result of one search: live ids (ascending distance), and its cost. */
final case class SearchResult(ids: Seq[Long], cost: OpCost)

/** The single-node SPFresh system (§4): foreground Updater + background
  * Local Rebuilder implementing LIRE over a [[BlockController]] and an
  * in-memory [[CentroidIndex]].
  *
  * The paper runs the Rebuilder on background threads; here jobs queue up
  * and [[drainJobs]] runs them deterministically (the feed-forward pipeline
  * with an explicit clock). Setting `rebalanceEnabled = false` turns the
  * engine into the paper's SPANN+ baseline: appends happen, split/merge/
  * reassign never do.
  */
final class SpFreshEngine(
    val dim: Int,
    val cfg: LireConfig = LireConfig(),
    val centroids: CentroidIndex = new BruteForceCentroidIndex,
    val rebalanceEnabled: Boolean = true,
    seed: Long = 0,
    attachedStore: Option[BlockController] = None,
    val reassignEnabled: Boolean = true,
) {
  /** The "device": fresh by default; crash recovery attaches a new engine
    * to the block controller that survived the crash (§4.4).
    */
  val store: BlockController = attachedStore.getOrElse(new BlockController(dim))
  val versions = new VersionMap
  val stats = new EngineStats

  sealed trait Job
  private final case class SplitJob(pid: Long) extends Job
  private final case class MergeJob(pid: Long) extends Job
  private final case class ReassignJob(vid: Long, vec: Array[Float], fromPid: Long, expectedVersion: Int)
      extends Job

  private val jobs = mutable.Queue.empty[Job]
  // Dedupe sets: re-enqueueing a split for a posting that already has one
  // pending (every append past the limit would) or a reassign for the same
  // (vid, version) (overlapping splits flag the same candidates) only wastes
  // Rebuilder cycles — the first queued job handles it.
  private val pendingSplits = mutable.Set.empty[Long]
  private val pendingReassigns = mutable.Set.empty[(Long, Int)]
  private var nextPid = 0L
  private val rnd = new scala.util.Random(seed)

  /** Queued background jobs awaiting [[drainJobs]]. */
  def pendingJobs: Int = jobs.size

  private def enqueueSplit(pid: Long): Boolean =
    if (pendingSplits.add(pid)) { stats.splitJobs += 1; jobs.enqueue(SplitJob(pid)); true }
    else false

  private val pendingMerges = mutable.Set.empty[Long]

  private def enqueueMerge(pid: Long): Unit =
    if (pendingMerges.add(pid)) jobs.enqueue(MergeJob(pid))

  private def enqueueReassign(vid: Long, vec: Array[Float], fromPid: Long, ver: Int): Unit =
    if (pendingReassigns.add((vid, ver))) jobs.enqueue(ReassignJob(vid, vec, fromPid, ver))

  private def freshPid(): Long = { val p = nextPid; nextPid += 1; p }

  // ------------------------------------------------------------------ build

  /** Initial balanced index construction (SPANN §3.1): hierarchical
    * balanced clustering with boundary-closure replicas. Closure
    * replication inflates posting row counts well past the primary
    * partition size (the paper observes 5.47 replicas/vector), so the build
    * runs two passes: a probe pass measures the inflation, then the real
    * pass sizes primary partitions so the replicated postings land under
    * the split limit; any stragglers go through the normal LIRE split path.
    */
  def buildInitial(vectors: Seq[(Long, Array[Float])]): Unit = {
    require(store.numPostings == 0, "buildInitial on a non-empty index")
    val pts = vectors.toIndexedSeq
    val probe = HierarchicalBuild.build(
      pts.map(_._2),
      targetSize = math.max(1, (cfg.splitLimit * 0.6).toInt),
      eps = cfg.replicaEpsilon,
      maxReplicas = cfg.maxReplicas,
      seed = seed,
    )
    val inflation =
      math.max(1.0, probe.memberships.iterator.map(_.length).sum.toDouble / pts.length)
    val layout =
      if (inflation <= 1.5) probe
      else HierarchicalBuild.build(
        pts.map(_._2),
        targetSize = math.max(1, (cfg.splitLimit * 0.8 / inflation).toInt),
        eps = cfg.replicaEpsilon,
        maxReplicas = cfg.maxReplicas,
        seed = seed,
      )
    val postingRecs = mutable.LongMap.empty[mutable.ArrayBuffer[VectorRecord]]
    pts.indices.foreach { i =>
      val (vid, vec) = pts(i)
      versions.register(vid)
      layout.memberships(i).foreach { part =>
        postingRecs.getOrElseUpdate(part.toLong, mutable.ArrayBuffer.empty) +=
          VectorRecord(vid, 0, vec)
      }
    }
    layout.centroids.indices.foreach { part =>
      val pid = freshPid()
      centroids.insert(pid, layout.centroids(part))
      store.put(pid, postingRecs.getOrElse(part.toLong, mutable.ArrayBuffer.empty).toSeq)
    }
    // Closure replication can still overfill a boundary-dense posting: hand
    // those to the Rebuilder so the built index starts LIRE-compliant.
    if (rebalanceEnabled) {
      store.postingIds.foreach { pid =>
        if (Lire.needsSplit(store.length(pid), cfg)) enqueueSplit(pid)
      }
      drainJobs()
    }
  }

  // ------------------------------------------------------ foreground updater

  /** The closure-assignment posting set of a vector (SPANN §3.1): the
    * nearest posting plus any whose centroid is within (1+ε) of the nearest
    * distance, capped at `maxReplicas`. Inserts and reassigns both write
    * through this rule so boundary vectors keep their replicas (§5.2 reports
    * 5.47 replicas/vector, "similar to the index built statically").
    */
  private def closurePids(vec: Array[Float]): Seq[Long] = {
    val cand = centroids.nearest(vec, cfg.maxReplicas)
    if (cand.isEmpty) Seq.empty
    else {
      val slack = (1.0 + cfg.replicaEpsilon) * (1.0 + cfg.replicaEpsilon)
      val dMin = cand.head._2
      cand.takeWhile(_._2 <= dMin * slack + 1e-12).map(_._1)
    }
  }

  /** Insert (§4.1 Updater): append to the closure posting set, nearest
    * first — §3.2 inserts "following the original SPANN index design",
    * whose assignment replicates boundary vectors; this is how §5.2's
    * replica census stays "similar to the index built statically".
    * On well-separated data the closure set degenerates to the single
    * nearest posting.
    */
  def insert(vid: Long, vec: Array[Float]): OpCost = {
    stats.inserts += 1
    val d0 = centroids.distanceComputations
    val (_, io) = store.io.measure {
      val targets = closurePids(vec)
      require(targets.nonEmpty, "insert into an empty index — call buildInitial first")
      versions.register(vid)
      targets.foreach { pid =>
        store.append(pid, VectorRecord(vid, 0, vec))
        if (rebalanceEnabled && Lire.needsSplit(store.length(pid), cfg)) enqueueSplit(pid)
      }
    }
    OpCost(io, centroids.distanceComputations - d0)
  }

  /** Delete (§4.1): tombstone in the version map; physical removal happens
    * in the Rebuilder's GC pass.
    */
  def delete(vid: Long): Unit = {
    stats.deletes += 1
    versions.markDeleted(vid)
  }

  // --------------------------------------------------------------- searcher

  /** Search `probes` nearest postings, drop stale replicas and tombstones,
    * return the k nearest live ids. Undersized postings spotted along the
    * way get merge jobs (§4.1: "a merge job is triggered by the Searcher").
    *
    * `blockBudget` enforces the paper's hard latency cut (§5.1: "the system
    * finishes the result immediately and returns the current search
    * results"): postings are scanned in ascending centroid distance and the
    * scan stops once the budget of block reads is exhausted — this is the
    * mechanism by which bloated append-only postings lose recall.
    */
  def search(q: Array[Float], k: Int, probes: Int = -1,
             blockBudget: Long = Long.MaxValue): SearchResult = {
    val nProbes = if (probes > 0) probes else cfg.searchProbes
    val d0 = centroids.distanceComputations
    val (ids, io) = store.io.measure {
      val cand = centroids.nearest(q, nProbes)
      var blocksUsed = 0L
      val scored = Seq.newBuilder[(Long, Double)]
      cand.foreach { case (pid, _) =>
        if (blocksUsed < blockBudget) {
          blocksUsed += store.blockCount(pid)
          val recs = store.get(pid)
          if (rebalanceEnabled) {
            val live = recs.count(r => !versions.isStale(r.vid, r.version))
            if (Lire.needsMerge(live, cfg) && centroids.size > 1 && centroids.get(pid).isDefined)
              enqueueMerge(pid)
          }
          recs.foreach { r =>
            if (!versions.isStale(r.vid, r.version))
              scored += ((r.vid, VectorMath.sqDist(q, r.vec)))
          }
        }
      }
      VectorMath.topK(scored.result(), k).map(_._1)
    }
    SearchResult(ids, OpCost(io, centroids.distanceComputations - d0))
  }

  /** Block-read cost of a query probing `probes` postings — the IOPS proxy
    * used by the stress bench without paying for the scan itself.
    */
  def probeCost(q: Array[Float], probes: Int): Long =
    centroids.nearest(q, probes).map { case (pid, _) => store.blockCount(pid).toLong }.sum

  // ------------------------------------------------------- local rebuilder

  /** Run queued background jobs (split → reassign → cascading splits) to
    * completion, or at most `max` jobs. Returns jobs processed. Termination
    * of the unbounded drain is the §3.4 convergence property.
    */
  def drainJobs(max: Long = Long.MaxValue): Long = {
    var n = 0L
    while (jobs.nonEmpty && n < max) {
      jobs.dequeue() match {
        case SplitJob(pid)   => runSplit(pid)
        case MergeJob(pid)   => runMerge(pid)
        case ReassignJob(vid, vec, fromPid, ver) => runReassign(vid, vec, fromPid, ver)
      }
      n += 1
    }
    n
  }

  /** Live (de-duplicated, current-version) records of a posting. */
  private def liveRecords(recs: Seq[VectorRecord]): Vector[VectorRecord] =
    recs.filter(r => !versions.isStale(r.vid, r.version))
      .groupBy(_.vid).valuesIterator.map(_.head).toVector

  private def runSplit(pid: Long): Unit = {
    pendingSplits.remove(pid)
    val oldC = centroids.get(pid).getOrElse(return) // posting vanished: stale job
    val live = liveRecords(store.get(pid))

    // GC pass (§4.2.1): if pruning stale replicas already fits the limit,
    // write back and stop — no split needed.
    if (live.length <= cfg.splitLimit) {
      stats.gcOnlySplits += 1
      store.put(pid, live)
      return
    }

    stats.splitsExecuted += 1
    val pts = live.map(_.vec)
    val r = BalancedKMeans.split2(pts, seed = rnd.nextLong())
    val sides = live.indices.groupBy(r.assignment(_))
    // Degenerate clustering (duplicates): force an even cut for termination.
    val (part0, part1) =
      if (sides.size < 2) live.splitAt(live.length / 2)
      else (sides(0).map(live(_)).toVector, sides(1).map(live(_)).toVector)
    val c0 = VectorMath.mean(part0.map(_.vec))
    val c1 = VectorMath.mean(part1.map(_.vec))

    // Neighbor postings are chosen by proximity to the *old* centroid before
    // it disappears (§3.3: "selecting several A_o's nearest postings").
    val neighbors =
      if (cfg.reassignRange > 0)
        centroids.nearest(oldC, cfg.reassignRange + 1).map(_._1).filterNot(_ == pid).take(cfg.reassignRange)
      else Seq.empty

    val p0 = freshPid(); val p1 = freshPid()
    store.put(p0, part0)
    store.put(p1, part1)
    centroids.insert(p0, c0)
    centroids.insert(p1, c1)
    centroids.remove(pid)
    store.delete(pid)

    if (reassignEnabled) {
      val newCs = Seq(c0, c1)
      // Condition 1: vectors of the split posting itself.
      (part0.map((_, p0)) ++ part1.map((_, p1))).foreach { case (rec, home) =>
        if (Lire.condition1(rec.vec, oldC, newCs))
          enqueueReassign(rec.vid, rec.vec, home, versions.currentVersion(rec.vid))
      }
      // Condition 2: vectors in the reassign range.
      neighbors.foreach { nb =>
        liveRecords(store.get(nb)).foreach { rec =>
          if (Lire.condition2(rec.vec, oldC, newCs))
            enqueueReassign(rec.vid, rec.vec, nb, versions.currentVersion(rec.vid))
        }
      }
    }
  }

  private def runMerge(pid: Long): Unit = {
    pendingMerges.remove(pid)
    val c = centroids.get(pid).getOrElse(return)
    val live = liveRecords(store.get(pid))
    if (!Lire.needsMerge(live.length, cfg)) { store.put(pid, live); return } // grew back: GC only
    val near = centroids.nearest(c, 2).map(_._1).filterNot(_ == pid)
    if (near.isEmpty) return // last posting standing
    val target = near.head
    stats.merges += 1
    // §3.2: delete the shorter posting and its centroid, append its vectors
    // to the survivor; target centroid is left as-is.
    val targetLive = liveRecords(store.get(target))
    store.put(target, targetLive ++ live)
    centroids.remove(pid)
    store.delete(pid)
    // Only the deleted posting's vectors need a reassign check (§3.3).
    if (reassignEnabled) live.foreach { rec =>
      enqueueReassign(rec.vid, rec.vec, target, versions.currentVersion(rec.vid))
    }
    if (rebalanceEnabled && Lire.needsSplit(store.length(target), cfg))
      enqueueSplit(target)
  }

  private def runReassign(vid: Long, vec: Array[Float], fromPid: Long, expectedVersion: Int): Unit = {
    pendingReassigns.remove((vid, expectedVersion))
    stats.reassignChecked += 1
    // Stale candidate (concurrent reassign won, or deleted): abort (§4.2.2).
    if (versions.currentVersion(vid) != expectedVersion || versions.isDeleted(vid)) {
      stats.reassignAborted += 1
      return
    }
    val best = centroids.nearest(vec, 1)
    if (best.isEmpty) { stats.reassignAborted += 1; return }
    val (bestPid, _) = best.head
    // Final NPA check (§3.3 false-positive elimination): move only if the
    // nearest posting is a strict improvement over the current home.
    val improves = centroids.get(fromPid) match {
      case Some(curC) => bestPid != fromPid && Lire.reassignImproves(vec, curC, centroids.get(bestPid).get)
      case None       => bestPid != fromPid // home vanished (split/merge raced): take the move
    }
    if (!improves) { stats.reassignAborted += 1; return }
    versions.tryBumpVersion(vid, expectedVersion) match {
      case None => stats.reassignAborted += 1 // CAS lost (§4.2.2)
      case Some(newVer) =>
        stats.reassignExecuted += 1
        // Write through the closure rule so the moved vector keeps its
        // boundary replicas; all old replicas are stale via the version bump.
        closurePids(vec).foreach { pid =>
          store.append(pid, VectorRecord(vid, newVer, vec))
          if (rebalanceEnabled && Lire.needsSplit(store.length(pid), cfg) && enqueueSplit(pid))
            stats.cascadeSplits += 1
        }
    }
  }

  // ---------------------------------------------------------------- metrics

  /** Live length of every posting (tombstones and stale replicas excluded);
    * drives balance and latency-distribution metrics.
    */
  def livePostingSizes(): Map[Long, Int] =
    store.postingIds.map(p => p -> liveRecords(store.get(p)).length).toMap

  /** Raw on-disk length of every posting (replicas included). */
  def rawPostingSizes(): Map[Long, Int] =
    store.postingIds.map(p => p -> store.length(p)).toMap

  /** Mean number of on-disk replicas per live vector (§5.2 reports 5.47). */
  def meanReplicas(): Double = {
    val live = versions.liveIds
    if (live.isEmpty) 0.0
    else {
      val total = store.postingIds.iterator.map { p =>
        store.get(p).count(r => !versions.isStale(r.vid, r.version))
      }.sum
      total.toDouble / live.size
    }
  }

  // ---------------------------------------------------------- recovery hooks

  /** Centroid map + pid counter as of now, for snapshotting (§4.4). */
  def centroidState(): (Map[Long, Array[Float]], Long) =
    (centroids.all.toMap, nextPid)

  /** Reload in-memory state from a snapshot: centroids and the pid counter.
    * Only valid on a freshly constructed engine attached to the surviving
    * block store; version-map restore happens via [[versions]].restore.
    */
  private[repro] def restoreCentroids(cs: Map[Long, Array[Float]], pidCounter: Long): Unit = {
    require(centroids.size == 0, "restoreCentroids on a used engine")
    cs.foreach { case (pid, c) => centroids.insert(pid, c) }
    nextPid = pidCounter
  }

  /** Memory model (bytes) per [[repro.metrics.ResourceModel]]. */
  def modelBytes: Long =
    repro.metrics.ResourceModel.clusterIndexBytes(
      centroids.size.toLong, dim, versions.size.toLong,
      store.postingIds.map(store.blockCount))
}
