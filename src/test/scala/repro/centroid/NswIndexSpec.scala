package repro.centroid

import scala.util.Random

import repro.SparkSpec

/** NSW graph index (SPTAG substitute): recall vs exact search, mutation
  * under splits (insert/remove), and compaction.
  */
class NswIndexSpec extends SparkSpec {

  private def pair(n: Int, dim: Int, seed: Long): (NswIndex, BruteForceCentroidIndex) = {
    val rnd = new Random(seed)
    val nsw = new NswIndex(m = 8, mMax = 16, ef = 48)
    val bf = new BruteForceCentroidIndex
    (0 until n).foreach { i =>
      val c = Array.fill(dim)(rnd.nextFloat() * 100)
      nsw.insert(i.toLong, c)
      bf.insert(i.toLong, c)
    }
    (nsw, bf)
  }

  test("single-node graph answers queries") {
    val nsw = new NswIndex()
    nsw.insert(7L, Array(1f, 1f))
    assert(nsw.nearest(Array(0f, 0f), 1).map(_._1) == Seq(7L))
  }

  test("recall@10 vs brute force is at least 0.95 on 500 centroids") {
    val (nsw, bf) = pair(500, 8, 1)
    val rnd = new Random(2)
    val recalls = (1 to 50).map { _ =>
      val q = Array.fill(8)(rnd.nextFloat() * 100)
      val got = nsw.nearest(q, 10).map(_._1).toSet
      val want = bf.nearest(q, 10).map(_._1).toSet
      got.intersect(want).size.toDouble / want.size
    }
    val mean = recalls.sum / recalls.length
    assert(mean >= 0.95, s"NSW recall too low: $mean")
  }

  test("nearest(1) usually finds the exact nearest (greedy navigability)") {
    val (nsw, bf) = pair(300, 4, 3)
    val rnd = new Random(4)
    val hits = (1 to 50).count { _ =>
      val q = Array.fill(4)(rnd.nextFloat() * 100)
      nsw.nearest(q, 1).headOption.map(_._1) == bf.nearest(q, 1).headOption.map(_._1)
    }
    assert(hits >= 45, s"nsw nearest-1 hit rate too low: $hits/50")
  }

  test("results are sorted ascending by distance") {
    val (nsw, _) = pair(100, 4, 5)
    val ds = nsw.nearest(Array.fill(4)(50f), 10).map(_._2)
    assert(ds == ds.sorted)
  }

  test("removed centroids never appear in results") {
    val (nsw, _) = pair(50, 4, 6)
    (0L until 10L).foreach(nsw.remove)
    val got = nsw.nearest(Array.fill(4)(50f), 20).map(_._1).toSet
    assert(got.intersect((0L until 10L).toSet).isEmpty)
    assert(nsw.size == 40)
  }

  test("get returns None for tombstoned nodes") {
    val (nsw, _) = pair(10, 2, 7)
    nsw.remove(3L)
    assert(nsw.get(3L).isEmpty)
    assert(nsw.get(4L).isDefined)
  }

  test("insert after removals keeps the graph navigable") {
    val (nsw, bf) = pair(200, 4, 8)
    val rnd = new Random(9)
    (0L until 50L).foreach { i => nsw.remove(i); bf.remove(i) }
    (200 until 250).foreach { i =>
      val c = Array.fill(4)(rnd.nextFloat() * 100)
      nsw.insert(i.toLong, c); bf.insert(i.toLong, c)
    }
    val recalls = (1 to 30).map { _ =>
      val q = Array.fill(4)(rnd.nextFloat() * 100)
      val got = nsw.nearest(q, 10).map(_._1).toSet
      val want = bf.nearest(q, 10).map(_._1).toSet
      got.intersect(want).size.toDouble / want.size
    }
    assert(recalls.sum / recalls.length >= 0.9)
  }

  test("compact removes tombstones and preserves recall") {
    val (nsw, bf) = pair(200, 4, 10)
    (0L until 60L).foreach { i => nsw.remove(i); bf.remove(i) }
    nsw.compact()
    assert(nsw.size == 140)
    val rnd = new Random(11)
    val recalls = (1 to 30).map { _ =>
      val q = Array.fill(4)(rnd.nextFloat() * 100)
      val got = nsw.nearest(q, 10).map(_._1).toSet
      val want = bf.nearest(q, 10).map(_._1).toSet
      got.intersect(want).size.toDouble / want.size
    }
    assert(recalls.sum / recalls.length >= 0.9)
  }

  test("removing the entry point keeps the index usable") {
    val nsw = new NswIndex()
    nsw.insert(1L, Array(0f))
    nsw.insert(2L, Array(5f))
    nsw.remove(1L) // 1 was the entry point
    assert(nsw.nearest(Array(0f), 1).map(_._1) == Seq(2L))
  }

  test("distance computations are counted") {
    val (nsw, _) = pair(50, 4, 12)
    val before = nsw.distanceComputations
    nsw.nearest(Array.fill(4)(1f), 5)
    assert(nsw.distanceComputations > before)
  }
}
