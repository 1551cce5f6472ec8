package repro.metrics

/** Converts counted work into milliseconds — the stand-in for the paper's
  * Azure lsv3 NVMe device (§5.1) that the container does not have.
  *
  * A query costs: in-memory centroid navigation (distance computations) plus
  * disk reads of the probed postings. ParallelGET overlaps posting reads
  * `ioParallelism` ways (the paper's batched async SPDK I/O), so latency
  * grows with `ceil(blocks / parallelism)` while IOPS grows with `blocks`.
  * Constants approximate a 100 µs 4 KiB NVMe read and a ~10 ns float-vector
  * distance computation; only *relative* shapes are meaningful, and the
  * paper's 10 ms hard latency cut (§5.1) is applied by callers.
  */
object LatencyModel {
  val BlockReadMs: Double = 0.10
  val BlockWriteMs: Double = 0.12
  val DistCompMs: Double = 1e-5
  val IoParallelism: Int = 8
  val HardCutMs: Double = 10.0

  /** Latency of a search that scanned `blocksRead` posting blocks after
    * `distComps` in-memory distance computations.
    */
  def searchMs(blocksRead: Long, distComps: Long): Double =
    distComps * DistCompMs +
      math.ceil(blocksRead.toDouble / IoParallelism) * BlockReadMs

  /** Latency of an insert: centroid navigation plus serial block I/O of the
    * last-block read-modify-write APPEND.
    */
  def insertMs(blocksRead: Long, blocksWritten: Long, distComps: Long): Double =
    distComps * DistCompMs + blocksRead * BlockReadMs + blocksWritten * BlockWriteMs

  /** Percentile of a latency sample (p in [0,100]), linear on the sorted
    * order statistic; the paper reports P90/P95/P99/P99.9.
    */
  def percentile(xs: Seq[Double], p: Double): Double = {
    require(xs.nonEmpty, "percentile of empty sample")
    val s = xs.sorted
    val idx = math.min(s.length - 1, math.max(0, math.ceil(p / 100.0 * s.length).toInt - 1))
    s(idx)
  }
}
