package repro.data

import scala.util.Random

import org.apache.spark.sql.{DataFrame, SparkSession}

/** Synthetic vector datasets standing in for SIFT1B / SPACEV1B (§5.1).
  *
  * Vectors are drawn from a Gaussian mixture over `[0,100]^dim`. Two update
  * regimes reproduce the paper's two dataset behaviors:
  *
  *  - '''stationary''' (SIFT-like, "almost uniformly distributed" per §5.2):
  *    the update pool is drawn from the *same* mixture as the base set, so
  *    posting distribution barely shifts;
  *  - '''shifted''' (SPACEV-like, "data distribution shifts over time"):
  *    the update pool is drawn from a mixture whose component weights are
  *    heavily skewed toward a subset of clusters and whose centers are
  *    displaced, so inserts concentrate and postings skew — the condition
  *    LIRE exists to fix.
  *
  * Everything is deterministic in `seed` so the single-node engine, the
  * Spark distributed index, and the DuckDB oracle all see identical bytes.
  */
object VectorGen {

  /** One labeled vector. Ids are assigned by the caller-facing generators. */
  final case class Vec(id: Long, vec: Array[Float])

  /** Mixture specification: cluster centers plus per-cluster weights. */
  final case class Mixture(centers: IndexedSeq[Array[Float]], weights: IndexedSeq[Double], sigma: Double) {
    require(centers.nonEmpty && centers.length == weights.length)
    private val cum: Array[Double] = weights.scanLeft(0.0)(_ + _).tail.toArray
    private val total = cum.last

    /** Draw one vector from the mixture using the supplied RNG. */
    def draw(rnd: Random): Array[Float] = {
      val u = rnd.nextDouble() * total
      var c = java.util.Arrays.binarySearch(cum, u)
      if (c < 0) c = -c - 1
      if (c >= centers.length) c = centers.length - 1
      val ctr = centers(c)
      Array.tabulate(ctr.length)(i => (ctr(i) + rnd.nextGaussian() * sigma).toFloat)
    }
  }

  /** A fresh mixture with `nClusters` centers uniform in `[0,100]^dim`. */
  def mixture(dim: Int, nClusters: Int, seed: Long, sigma: Double = 4.0): Mixture = {
    val rnd = new Random(seed)
    val centers = IndexedSeq.fill(nClusters)(Array.fill(dim)((rnd.nextDouble() * 100).toFloat))
    Mixture(centers, IndexedSeq.fill(nClusters)(1.0), sigma)
  }

  /** SPACEV-like shifted variant of `base`: weights become Zipf-skewed over a
    * random cluster order and centers drift by `driftSigma` per dimension, so
    * new inserts pile into a few (displaced) regions of the space.
    */
  def shifted(base: Mixture, seed: Long, zipfAlpha: Double = 1.5, driftSigma: Double = 6.0): Mixture = {
    val rnd = new Random(seed)
    val order = rnd.shuffle(base.centers.indices.toIndexedSeq)
    val w = new Array[Double](base.centers.length)
    order.zipWithIndex.foreach { case (c, rank) => w(c) = 1.0 / math.pow(rank + 1, zipfAlpha) }
    val centers = base.centers.map(ctr => ctr.map(x => (x + rnd.nextGaussian() * driftSigma).toFloat))
    Mixture(centers, w.toIndexedSeq, base.sigma)
  }

  /** `n` vectors with ids `[idStart, idStart+n)` drawn from `mix`. */
  def draw(mix: Mixture, n: Int, idStart: Long, seed: Long): IndexedSeq[Vec] = {
    val rnd = new Random(seed)
    IndexedSeq.tabulate(n)(i => Vec(idStart + i, mix.draw(rnd)))
  }

  /** An update epoch in the paper's Workload A/B/C shape (§5.1): delete
    * `rate` of the live set at random, insert the same count of fresh
    * vectors from the update pool.
    *
    * @return (idsToDelete, freshInserts)
    */
  def epoch(
      liveIds: IndexedSeq[Long],
      pool: Mixture,
      rate: Double,
      nextId: Long,
      seed: Long,
  ): (IndexedSeq[Long], IndexedSeq[Vec]) = {
    val rnd = new Random(seed)
    val k = math.max(1, (liveIds.length * rate).toInt)
    val dels = rnd.shuffle(liveIds).take(k)
    val ins = draw(pool, k, nextId, seed ^ 0x5f3759df)
    (dels, ins)
  }

  /** Weighted union of two mixtures: draws come from `a` with probability
    * `shareA`, else from `b`. Used to build a query distribution matching a
    * dataset that is part base data, part shifted inserts.
    */
  def combined(a: Mixture, b: Mixture, shareA: Double): Mixture = {
    require(shareA >= 0 && shareA <= 1, "shareA is a probability")
    val wa = a.weights.map(w => w / a.weights.sum * shareA)
    val wb = b.weights.map(w => w / b.weights.sum * (1.0 - shareA))
    Mixture(a.centers ++ b.centers, wa ++ wb, (a.sigma + b.sigma) / 2)
  }

  /** Query workload: vectors drawn from the same mixture as the data (test
    * sets in SIFT/SPACEV are in-distribution).
    */
  def queries(mix: Mixture, n: Int, seed: Long): IndexedSeq[Array[Float]] = {
    val rnd = new Random(seed)
    IndexedSeq.fill(n)(mix.draw(rnd))
  }

  /** Lift local vectors into a DataFrame `(id BIGINT, vec ARRAY<FLOAT>)` —
    * the distributed index's ingestion format.
    */
  def toDf(spark: SparkSession, vs: Seq[Vec]): DataFrame = {
    import spark.implicits._
    vs.map(v => (v.id, v.vec)).toDF("id", "vec")
  }
}
