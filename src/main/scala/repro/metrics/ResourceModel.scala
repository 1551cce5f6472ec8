package repro.metrics

/** Byte-level memory accounting following the paper's own bookkeeping
  * (§4.1, §4.3, §5.2): version map at 1 B per vector, block-mapping entries
  * at 40 B plus 8 B per block offset beyond the inline three, centroid
  * entries at raw vector size plus graph overhead. Used to reproduce the
  * memory rows of Table 1/Table 2 as a *model* — the JVM heap is not the
  * quantity the paper measures.
  */
object ResourceModel {

  /** Per-centroid in-memory cost: raw float vector + SPTAG-style graph node
    * overhead (id, edges).
    */
  def centroidBytes(nCentroids: Long, dim: Int): Long =
    nCentroids * (4L * dim + 64L)

  /** Version map: the paper's single byte per tracked vector. */
  def versionMapBytes(nVectors: Long): Long = nVectors

  /** Block mapping: 40 B per entry covers ~3 inline block offsets; longer
    * postings (SPANN+'s ever-growing ones) pay 8 B per extra block. This is
    * why the paper notes "SPANN+ needs much larger block-mapping entries".
    */
  def blockMappingBytes(blocksPerPosting: Seq[Int]): Long =
    blocksPerPosting.map(b => 40L + 8L * math.max(0, b - 3)).sum

  /** Total SPFresh/SPANN+ resident model. */
  def clusterIndexBytes(nCentroids: Long, dim: Int, nVectors: Long, blocksPerPosting: Seq[Int]): Long =
    centroidBytes(nCentroids, dim) + versionMapBytes(nVectors) + blockMappingBytes(blocksPerPosting)

  /** DiskANN resident model: PQ-compressed vectors (1 B/dim), medoid cache,
    * plus — while a streamingMerge is running — a full extra graph copy
    * (R 4-byte edges per vertex) and the secondary in-memory index holding
    * raw delta vectors. This reproduces the paper's observation of an extra
    * ~60 GB for background merge + 15 GB for the secondary index.
    */
  def diskAnnBytes(nVectors: Long, dim: Int, graphDegree: Int,
                   deltaVectors: Long, merging: Boolean): Long = {
    val pq = nVectors * dim.toLong // 1 byte per dim PQ code
    val secondary = deltaVectors * (4L * dim + graphDegree * 4L)
    val mergeSpike = if (merging) nVectors * (graphDegree * 4L + 4L * dim) else 0L
    pq + secondary + mergeSpike
  }

  def mb(bytes: Long): Double = bytes / (1024.0 * 1024.0)
}
