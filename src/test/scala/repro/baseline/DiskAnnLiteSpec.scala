package repro.baseline

import repro.SparkSpec
import repro.data.{GroundTruth, VectorGen}

/** DiskANN-lite baseline: graph build quality, beam search recall, fresh
  * out-of-place updates, tombstones, and streamingMerge.
  */
class DiskAnnLiteSpec extends SparkSpec {
  private val dim = 8
  private def mix(seed: Long = 1) = VectorGen.mixture(dim, 6, seed)

  private def fresh(n: Int, seed: Long = 1): (DiskAnnLite, IndexedSeq[VectorGen.Vec]) = {
    val base = VectorGen.draw(mix(seed), n, 0, seed + 1)
    val ann = new DiskAnnLite(dim, seed = seed)
    ann.build(base.map(v => (v.id, v.vec)))
    (ann, base)
  }

  test("build creates a connected searchable graph") {
    val (ann, base) = fresh(400)
    val data = base.map(v => (v.id, v.vec))
    val qs = VectorGen.queries(mix(), 30, seed = 5)
    val recalls = qs.map { q =>
      GroundTruth.recall(ann.search(q, 10, beam = 40)._1, GroundTruth.topK(q, data, 10))
    }
    val mean = recalls.sum / recalls.length
    assert(mean >= 0.85, s"graph recall too low: $mean")
  }

  test("search counts expanded nodes as disk reads") {
    val (ann, _) = fresh(300)
    val q = VectorGen.queries(mix(), 1, seed = 7).head
    val (_, reads) = ann.search(q, 10)
    assert(reads > 0)
  }

  test("wider beams expand at least as many nodes") {
    val (ann, _) = fresh(300)
    val q = VectorGen.queries(mix(), 1, seed = 9).head
    val (_, lo) = ann.search(q, 10, beam = 10)
    val (_, hi) = ann.search(q, 10, beam = 80)
    assert(hi >= lo)
  }

  test("fresh inserts are immediately searchable via the delta buffer") {
    val (ann, _) = fresh(300)
    val v = VectorGen.draw(mix(), 1, 9999, seed = 11).head
    ann.insert(v.id, v.vec)
    assert(ann.search(v.vec, 5)._1.contains(v.id))
    assert(ann.deltaSize == 1)
  }

  test("deletes tombstone vectors out of results") {
    val (ann, base) = fresh(300)
    val victim = base.head
    ann.delete(victim.id)
    assert(!ann.search(victim.vec, 5)._1.contains(victim.id))
  }

  test("streamingMerge folds the delta into the graph and drops tombstones") {
    val (ann, base) = fresh(300)
    val fresh50 = VectorGen.draw(mix(), 50, 10000, seed = 13)
    fresh50.foreach(v => ann.insert(v.id, v.vec))
    base.take(30).foreach(v => ann.delete(v.id))
    val ms = ann.streamingMerge()
    assert(ms >= 0)
    assert(ann.deltaSize == 0)
    assert(ann.graphSize == 300 - 30 + 50)
    // merged vectors searchable in the main graph now
    val hits = fresh50.take(10).count(v => ann.search(v.vec, 10)._1.contains(v.id))
    assert(hits >= 8, s"merged vectors lost: $hits/10")
    base.take(30).foreach(v => assert(!ann.search(v.vec, 10)._1.contains(v.id)))
  }

  test("merge accounting accumulates") {
    val (ann, _) = fresh(200)
    ann.streamingMerge()
    ann.streamingMerge()
    assert(ann.mergeCount == 2)
  }

  test("post-merge recall stays high") {
    val (ann, base) = fresh(400, seed = 3)
    val fresh100 = VectorGen.draw(mix(3), 100, 10000, seed = 17)
    fresh100.foreach(v => ann.insert(v.id, v.vec))
    ann.streamingMerge()
    val data = (base ++ fresh100).map(v => (v.id, v.vec))
    val qs = VectorGen.queries(mix(3), 20, seed = 19)
    val recalls = qs.map { q =>
      GroundTruth.recall(ann.search(q, 10, beam = 40)._1, GroundTruth.topK(q, data, 10))
    }
    assert(recalls.sum / recalls.length >= 0.8)
  }

  test("memory model spikes during merge") {
    val (ann, _) = fresh(300)
    assert(ann.modelBytes(merging = true) > ann.modelBytes(merging = false))
  }

  test("empty build yields empty searches") {
    val ann = new DiskAnnLite(dim)
    ann.build(Seq.empty)
    assert(ann.search(Array.fill(dim)(0f), 5)._1.isEmpty)
  }
}
