package repro.core.engine

import scala.util.Random

import repro.SparkSpec
import repro.core.{LireConfig, VectorMath}
import repro.data.{GroundTruth, VectorGen}

/** The single-node SPFresh engine: build, insert/delete, search recall,
  * split/merge/reassign behavior, NPA maintenance, and §3.4 convergence.
  */
class SpFreshEngineSpec extends SparkSpec {
  private val dim = 8
  private val cfg = LireConfig(splitLimit = 32, mergeThreshold = 4, reassignRange = 8,
    searchProbes = 8)

  private def mix(seed: Long = 1) = VectorGen.mixture(dim, 6, seed)

  private def fresh(n: Int, seed: Long = 1): (SpFreshEngine, IndexedSeq[VectorGen.Vec]) = {
    val base = VectorGen.draw(mix(seed), n, 0, seed + 1)
    val e = new SpFreshEngine(dim, cfg, seed = seed)
    e.buildInitial(base.map(v => (v.id, v.vec)))
    (e, base)
  }

  test("buildInitial produces postings within the split limit") {
    val (e, _) = fresh(400)
    assert(e.livePostingSizes().values.forall(_ <= cfg.splitLimit))
  }

  test("buildInitial registers every vector as live") {
    val (e, base) = fresh(200)
    assert(base.forall(v => e.versions.isLive(v.id)))
  }

  test("search finds built vectors with high recall") {
    val (e, base) = fresh(500)
    val data = base.map(v => (v.id, v.vec))
    val qs = VectorGen.queries(mix(), 30, seed = 7)
    val recalls = qs.map { q =>
      GroundTruth.recall(e.search(q, 10).ids, GroundTruth.topK(q, data, 10))
    }
    val mean = recalls.sum / recalls.length
    assert(mean >= 0.9, s"build recall too low: $mean")
  }

  test("insert places a vector in its nearest posting and makes it searchable") {
    val (e, _) = fresh(300)
    val v = VectorGen.draw(mix(), 1, 9999, seed = 11).head
    e.insert(v.id, v.vec)
    assert(e.search(v.vec, 5).ids.contains(v.id))
  }

  test("insert into an empty index is rejected") {
    val e = new SpFreshEngine(dim, cfg)
    intercept[IllegalArgumentException](e.insert(1L, Array.fill(dim)(0f)))
  }

  test("deleted vectors disappear from search results") {
    val (e, base) = fresh(300)
    val victim = base.head
    assert(e.search(victim.vec, 5).ids.contains(victim.id))
    e.delete(victim.id)
    assert(!e.search(victim.vec, 5).ids.contains(victim.id))
  }

  test("an insert storm triggers splits that keep live sizes bounded") {
    val (e, _) = fresh(300)
    VectorGen.draw(mix(), 600, 10000, seed = 13).foreach(v => e.insert(v.id, v.vec))
    e.drainJobs()
    val sizes = e.livePostingSizes().values
    assert(sizes.forall(_ <= cfg.splitLimit), s"oversized after drain: ${sizes.max}")
    assert(e.stats.splitsExecuted > 0, "storm should have split something")
  }

  test("split-reassign cascades converge (§3.4: drain terminates)") {
    val (e, _) = fresh(200)
    // Concentrated inserts into one region force repeated splits + reassigns.
    val hot = VectorGen.Mixture(IndexedSeq(mix().centers.head), IndexedSeq(1.0), 2.0)
    VectorGen.draw(hot, 800, 20000, seed = 17).foreach(v => e.insert(v.id, v.vec))
    val processed = e.drainJobs()
    assert(processed > 0)
    assert(e.pendingJobs == 0)
    assert(e.livePostingSizes().values.forall(_ <= cfg.splitLimit))
  }

  test("NPA holds after rebalance: every live vector's nearest centroid hosts a replica") {
    val (e, _) = fresh(300)
    VectorGen.draw(mix(), 300, 30000, seed = 19).foreach(v => e.insert(v.id, v.vec))
    e.drainJobs()
    // Collect vector -> postings map from storage.
    val homes = scala.collection.mutable.Map.empty[Long, Set[Long]].withDefaultValue(Set.empty)
    val vecs = scala.collection.mutable.Map.empty[Long, Array[Float]]
    e.store.postingIds.foreach { pid =>
      e.store.get(pid).foreach { r =>
        if (!e.versions.isStale(r.vid, r.version)) {
          homes(r.vid) = homes(r.vid) + pid
          vecs(r.vid) = r.vec
        }
      }
    }
    // For NPA quality we tolerate a small violation rate from deferred jobs,
    // but after a full drain it should be essentially zero.
    val violations = vecs.count { case (vid, v) =>
      val nearest = e.centroids.nearest(v, 1).head._1
      !homes(vid).contains(nearest)
    }
    assert(violations <= vecs.size / 100,
      s"NPA violations after drain: $violations / ${vecs.size}")
  }

  test("merge absorbs a posting drained by deletions") {
    val (e, base) = fresh(400, seed = 3)
    // Delete almost everything near one cluster center to starve postings.
    val c = mix(3).centers.head
    val near = base.sortBy(v => VectorMath.sqDist(v.vec, c)).take(150)
    near.foreach(v => e.delete(v.id))
    // Searches in that region notice undersized postings and enqueue merges.
    (1 to 20).foreach(_ => e.search(c, 10))
    e.drainJobs()
    assert(e.stats.merges > 0, "deletion storm should have merged something")
    val sizes = e.livePostingSizes().values
    assert(sizes.forall(_ <= cfg.splitLimit))
  }

  test("stale replicas are garbage collected by splits") {
    val (e, _) = fresh(300, seed = 5)
    VectorGen.draw(mix(5), 900, 40000, seed = 23).foreach(v => e.insert(v.id, v.vec))
    e.drainJobs()
    // After GC inside splits, raw sizes may exceed live but never wildly:
    val raw = e.rawPostingSizes()
    val live = e.livePostingSizes()
    raw.keys.foreach { pid =>
      assert(raw(pid) <= cfg.splitLimit + cfg.mergeThreshold || live(pid) > 0)
      assert(raw(pid) <= 2 * cfg.splitLimit, s"posting $pid runaway raw size ${raw(pid)}")
    }
  }

  test("reassign bumps versions so old replicas go stale") {
    val (e, _) = fresh(300, seed = 7)
    VectorGen.draw(mix(7), 500, 50000, seed = 29).foreach(v => e.insert(v.id, v.vec))
    e.drainJobs()
    if (e.stats.reassignExecuted > 0) {
      val bumped = e.versions.liveIds.count(v => e.versions.currentVersion(v) > 0)
      assert(bumped > 0, "executed reassigns must be visible as version bumps")
    }
  }

  test("recall stays high through an update cycle (insert+delete+drain)") {
    val (e, base) = fresh(600, seed = 9)
    var live = base.map(v => (v.id, v.vec)).toMap
    val pool = VectorGen.mixture(dim, 6, seed = 9)
    var nextId = 10000L
    (1 to 5).foreach { ep =>
      val (dels, ins) = VectorGen.epoch(live.keys.toIndexedSeq.sorted, pool, 0.05, nextId, seed = 31 + ep)
      dels.foreach { id => e.delete(id); live -= id }
      ins.foreach { v => e.insert(v.id, v.vec); live += (v.id -> v.vec) }
      nextId += ins.length
      e.drainJobs()
    }
    val qs = VectorGen.queries(pool, 30, seed = 37)
    val data = live.toSeq
    val recalls = qs.map(q => GroundTruth.recall(e.search(q, 10).ids, GroundTruth.topK(q, data, 10)))
    val mean = recalls.sum / recalls.length
    assert(mean >= 0.85, s"post-update recall too low: $mean")
  }

  test("search cost scales with probe count") {
    val (e, _) = fresh(500, seed = 11)
    val q = VectorGen.queries(mix(11), 1, seed = 41).head
    val lo = e.search(q, 10, probes = 2).cost.io.reads
    val hi = e.search(q, 10, probes = 8).cost.io.reads
    assert(hi > lo)
  }

  test("probeCost equals the blocks of the probed postings") {
    val (e, _) = fresh(300, seed = 13)
    val q = VectorGen.queries(mix(13), 1, seed = 43).head
    val pids = e.centroids.nearest(q, 4).map(_._1)
    val expect = pids.map(e.store.blockCount(_).toLong).sum
    assert(e.probeCost(q, 4) == expect)
  }

  test("meanReplicas reflects closure replication") {
    val (e, _) = fresh(400, seed = 15)
    val m = e.meanReplicas()
    assert(m >= 1.0 && m <= cfg.maxReplicas.toDouble, s"implausible replica mean: $m")
  }

  test("rebalance-disabled engine (SPANN+) never splits, merges, or reassigns") {
    val e = new SpFreshEngine(dim, cfg, rebalanceEnabled = false)
    val base = VectorGen.draw(mix(17), 300, 0, seed = 47)
    e.buildInitial(base.map(v => (v.id, v.vec)))
    VectorGen.draw(mix(17), 600, 10000, seed = 53).foreach(v => e.insert(v.id, v.vec))
    (1 to 10).foreach(_ => e.search(base.head.vec, 10))
    e.drainJobs()
    assert(e.stats.splitsExecuted == 0 && e.stats.merges == 0 && e.stats.reassignExecuted == 0)
    assert(e.livePostingSizes().values.max > cfg.splitLimit, "SPANN+ postings must grow unbounded")
  }

  test("stats counters are coherent") {
    val (e, _) = fresh(300, seed = 19)
    VectorGen.draw(mix(19), 400, 60000, seed = 59).foreach(v => e.insert(v.id, v.vec))
    e.drainJobs()
    assert(e.stats.inserts == 400)
    assert(e.stats.reassignExecuted + e.stats.reassignAborted <= e.stats.reassignChecked)
  }

  test("drainJobs with a budget stops early and can resume") {
    val (e, _) = fresh(300, seed = 21)
    val hot = VectorGen.Mixture(IndexedSeq(mix(21).centers.head), IndexedSeq(1.0), 2.0)
    VectorGen.draw(hot, 400, 70000, seed = 61).foreach(v => e.insert(v.id, v.vec))
    val first = e.drainJobs(max = 1)
    assert(first <= 1)
    e.drainJobs()
    assert(e.pendingJobs == 0)
  }
}
