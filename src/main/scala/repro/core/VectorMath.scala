package repro.core

/** Dense float-vector primitives shared by every index in the repo.
  *
  * All distances are squared Euclidean (the paper assumes a Euclidean
  * space in §3.3; squared form preserves the ordering every LIRE
  * condition and every nearest-neighbor decision relies on, and avoids
  * the sqrt in inner loops).
  */
object VectorMath {

  /** Squared Euclidean distance between two same-length vectors. */
  def sqDist(a: Array[Float], b: Array[Float]): Double = {
    require(a.length == b.length, s"dim mismatch: ${a.length} vs ${b.length}")
    var s = 0.0
    var i = 0
    while (i < a.length) {
      val d = a(i).toDouble - b(i).toDouble // double math: bit-stable vs SQL oracles
      s += d * d
      i += 1
    }
    s
  }

  /** Euclidean distance (sqrt of [[sqDist]]); only for human-facing output. */
  def dist(a: Array[Float], b: Array[Float]): Double = math.sqrt(sqDist(a, b))

  /** Component-wise mean of a non-empty collection of vectors. */
  def mean(vs: Iterable[Array[Float]]): Array[Float] = {
    require(vs.nonEmpty, "mean of empty vector set")
    val dim = vs.head.length
    val acc = new Array[Double](dim)
    var n = 0
    vs.foreach { v =>
      var i = 0
      while (i < dim) { acc(i) += v(i); i += 1 }
      n += 1
    }
    val out = new Array[Float](dim)
    var i = 0
    while (i < dim) { out(i) = (acc(i) / n).toFloat; i += 1 }
    out
  }

  /** Indices of the `k` nearest candidates to `q`, ascending by distance.
    * Ties break on index for determinism. O(n·dim + n log n); candidate
    * sets here are small (centroids, single postings).
    */
  def argminK(q: Array[Float], candidates: IndexedSeq[Array[Float]], k: Int): IndexedSeq[Int] = {
    val scored = candidates.indices.map(i => (sqDist(q, candidates(i)), i))
    scored.sortBy(identity).take(k).map(_._2)
  }

  /** Top-`k` (id, sqDist) pairs from scored candidates, ascending distance,
    * deduplicated by id keeping the minimum distance (replica handling).
    */
  def topK(scored: Iterable[(Long, Double)], k: Int): Seq[(Long, Double)] =
    scored
      .groupMapReduce(_._1)(_._2)(math.min)
      .toSeq
      .sortBy { case (id, d) => (d, id) }
      .take(k)
}
