package repro.centroid

import scala.collection.mutable

import repro.core.VectorMath

/** Navigable-small-world graph over centroids — the graph-index stand-in
  * for SPTAG (§3.1). Nodes connect to their `m` nearest discovered
  * neighbors at insert time (bidirectional, pruned to `mMax`); search is a
  * best-first beam of width `ef` from a fixed entry point.
  *
  * Removal is lazy (tombstone + filtered results) with edges left in place
  * as navigation shortcuts until [[compact]] — the same trade SPFresh makes
  * with stale on-disk replicas.
  */
final class NswIndex(m: Int = 8, mMax: Int = 16, ef: Int = 32) extends CentroidIndex {
  require(m >= 1 && mMax >= m && ef >= 1)

  private val vecs = mutable.LongMap.empty[Array[Float]]
  private val edges = mutable.LongMap.empty[mutable.Set[Long]]
  private val dead = mutable.Set.empty[Long]
  private var entry: Option[Long] = None
  private var distComps = 0L

  private def d(a: Array[Float], b: Array[Float]): Double = {
    distComps += 1
    VectorMath.sqDist(a, b)
  }

  override def insert(pid: Long, centroid: Array[Float]): Unit = {
    require(!vecs.contains(pid), s"posting $pid already indexed")
    vecs.update(pid, centroid)
    edges.update(pid, mutable.Set.empty)
    if (entry.isEmpty || dead(entry.get)) entry = Some(pid)
    else {
      val near = beam(centroid, math.max(ef, m), includeDead = true).take(m)
      near.foreach { case (n, _) =>
        edges(pid) += n
        val back = edges(n)
        back += pid
        if (back.size > mMax) {
          // Prune the farthest back-edge to bound degree.
          val worst = back.maxBy(x => d(vecs(n), vecs(x)))
          back -= worst
        }
      }
    }
  }

  override def remove(pid: Long): Unit =
    if (vecs.contains(pid)) {
      dead += pid
      if (entry.contains(pid)) entry = vecs.keysIterator.find(k => !dead(k))
    }

  override def get(pid: Long): Option[Array[Float]] =
    if (dead(pid)) None else vecs.get(pid)

  override def nearest(q: Array[Float], k: Int): Seq[(Long, Double)] =
    beam(q, math.max(ef, k), includeDead = false).take(k)

  /** Best-first beam search. Tombstoned nodes are traversed (shortcuts) but
    * filtered from results unless `includeDead`.
    */
  private def beam(q: Array[Float], width: Int, includeDead: Boolean): Seq[(Long, Double)] = {
    entry match {
      case None => Seq.empty
      case Some(e) =>
        val visited = mutable.Set(e)
        // candidates: min-heap by distance; results: max-heap bounded at width
        val cand = mutable.PriorityQueue((d(q, vecs(e)), e))(Ordering.by(x => -x._1))
        val res = mutable.PriorityQueue((d(q, vecs(e)), e))(Ordering.by(_._1))
        while (cand.nonEmpty) {
          val (cd, c) = cand.dequeue()
          if (res.size >= width && cd > res.head._1) cand.clear()
          else edges.getOrElse(c, mutable.Set.empty).foreach { n =>
            if (!visited(n)) {
              visited += n
              val nd = d(q, vecs(n))
              if (res.size < width || nd < res.head._1) {
                cand.enqueue((nd, n))
                res.enqueue((nd, n))
                if (res.size > width) res.dequeue()
              }
            }
          }
        }
        res.toSeq
          .filter { case (_, n) => includeDead || !dead(n) }
          .map { case (dd, n) => (n, dd) }
          .sortBy { case (n, dd) => (dd, n) }
    }
  }

  /** Drop tombstoned nodes and their edges, reconnecting survivors whose
    * degree fell below `m` to their nearest survivors.
    */
  def compact(): Unit = {
    val gone = dead.toSet
    gone.foreach { pid => vecs.remove(pid); edges.remove(pid) }
    dead.clear()
    edges.foreach { case (pid, nbrs) =>
      nbrs --= gone
      if (nbrs.size < m && vecs.size > 1) {
        val near = vecs.iterator
          .filter(_._1 != pid)
          .map { case (n, v) => (n, d(vecs(pid), v)) }
          .toSeq
          .sortBy(_._2)
          .take(m)
        near.foreach { case (n, _) => nbrs += n; edges(n) += pid }
      }
    }
    if (entry.forall(gone)) entry = vecs.keysIterator.nextOption()
  }

  override def size: Int = vecs.size - dead.size

  override def all: Iterator[(Long, Array[Float])] =
    vecs.iterator.filter { case (pid, _) => !dead(pid) }

  override def distanceComputations: Long = distComps
}
