package repro.centroid

import scala.collection.mutable

import repro.core.VectorMath

/** In-memory index over posting centroids — SPANN keeps an SPTAG graph in
  * DRAM for "quick identification of candidate postings" (§3.1); SPFresh
  * mutates it as splits/merges create and delete centroids (§4.1).
  *
  * Implementations must support concurrent-free single-writer mutation and
  * lock-free reads at the scale used here.
  */
trait CentroidIndex {

  /** Register a new posting centroid. `pid` must be fresh. */
  def insert(pid: Long, centroid: Array[Float]): Unit

  /** Remove a posting centroid (after a split deletes the old posting). */
  def remove(pid: Long): Unit

  /** Centroid of a posting, if it exists. */
  def get(pid: Long): Option[Array[Float]]

  /** The `k` nearest posting ids to `q` with squared distances, ascending. */
  def nearest(q: Array[Float], k: Int): Seq[(Long, Double)]

  /** Number of live centroids. */
  def size: Int

  /** All live (pid, centroid) pairs. */
  def all: Iterator[(Long, Array[Float])]

  /** Distance computations performed since construction — the in-memory
    * navigation cost component of the latency model.
    */
  def distanceComputations: Long
}

/** Exact centroid search. At reproduction scale (≲2k centroids) a linear
  * scan is both exact and fast; it plays the role of a perfectly-recalled
  * SPTAG. Distance computations are counted so the latency model still sees
  * the in-memory navigation cost grow with centroid count (§5.3 observes
  * exactly this growth).
  */
final class BruteForceCentroidIndex extends CentroidIndex {
  private val map = mutable.LongMap.empty[Array[Float]]
  private var distComps = 0L

  override def insert(pid: Long, centroid: Array[Float]): Unit = {
    require(!map.contains(pid), s"posting $pid already indexed")
    map.update(pid, centroid)
  }

  override def remove(pid: Long): Unit = map.remove(pid)

  override def get(pid: Long): Option[Array[Float]] = map.get(pid)

  override def nearest(q: Array[Float], k: Int): Seq[(Long, Double)] = {
    distComps += map.size
    map.iterator
      .map { case (pid, c) => (pid, VectorMath.sqDist(q, c)) }
      .toSeq
      .sortBy { case (pid, d) => (d, pid) }
      .take(k)
  }

  override def size: Int = map.size

  override def all: Iterator[(Long, Array[Float])] = map.iterator

  override def distanceComputations: Long = distComps
}
