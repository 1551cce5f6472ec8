package repro.core.distributed

import scala.collection.mutable

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.expressions.UserDefinedFunction
import org.apache.spark.sql.functions._

import repro.cluster.HierarchicalBuild
import repro.core.{LireConfig, VectorMath, VersionMap}

/** One on-lake posting tuple — the Parquet mirror of the Block Controller's
  * `<vector id, version, raw vector>` record (§4.3).
  */
final case class PostingRow(vid: Long, pid: Long, version: Int, vec: Array[Float])

/** The distributed SPFresh index: LIRE over a data lake.
  *
  * This is the calibration hint's target form — "a distributed ANN index
  * with partition-based rebalancing via DataFrame operations, maintaining
  * vector partitions as Parquet files with incremental split/reassign
  * jobs". The mapping from the paper:
  *
  *  - postings → rows of an immutable Parquet dataset under `rootDir`;
  *    every update/rebalance epoch commits a new version directory
  *    (copy-on-write, like the Block Controller's append-only blocks);
  *  - SPTAG centroid index + version map → driver-resident metadata,
  *    exactly the structures the paper keeps in DRAM (§4.1);
  *  - Updater → [[insertBatch]]/[[deleteBatch]] (micro-batch epochs — the
  *    dataflow form of the paper's online updates, see DESIGN.md);
  *  - Local Rebuilder → [[DistRebalancer]], whose split/merge/reassign
  *    rounds are Catalyst jobs;
  *  - Searcher → [[search]], a broadcast-probe / join / window top-k
  *    pipeline.
  *
  * Stale replicas behave as on SSD: superseded versions stay in the lake
  * until the next split of their posting garbage-collects them; queries
  * filter them through the broadcast version map.
  */
final class DistIndex private[distributed] (
    val spark: SparkSession,
    val rootDir: String,
    val dim: Int,
    val cfg: LireConfig,
) {
  private[distributed] val centroids = mutable.LongMap.empty[Array[Float]]
  private[distributed] val versions = new VersionMap
  private[distributed] var nextPid: Long = 0L
  private var commitSeq: Int = 0
  private var currentPath: String = _

  private[distributed] def freshPid(): Long = { val p = nextPid; nextPid += 1; p }

  /** The current committed posting dataset. */
  def postings: DataFrame = spark.read.parquet(currentPath)

  /** Commit a new index version (immutable Parquet directory + pointer). */
  private[distributed] def commit(df: DataFrame): Unit = {
    val path = s"$rootDir/postings_v$commitSeq"
    commitSeq += 1
    df.select(col("vid"), col("pid"), col("version"), col("vec"))
      .write.mode("overwrite").parquet(path)
    currentPath = path
  }

  /** Number of committed index versions so far. */
  def commits: Int = commitSeq

  // ------------------------------------------------------------ driver views

  /** Immutable snapshot of the centroid map for broadcasting into UDFs. */
  def centroidSnapshot: Array[(Long, Array[Float])] = centroids.toArray

  /** Driver-side nearest-centroid search (the SPTAG role). */
  def nearestPids(v: Array[Float], k: Int): Seq[Long] =
    centroids.toSeq
      .map { case (pid, c) => (VectorMath.sqDist(v, c), pid) }
      .sorted.take(k).map(_._2)

  /** Vector states that differ from the freshly-inserted default — the only
    * part of the version map queries need (kept small for broadcast).
    */
  def dirtyStates: Map[Long, (Int, Boolean)] =
    versions.snapshot().filter { case (_, (v, d)) => v > 0 || d }

  /** UDF: a stored row is live iff not tombstoned and its on-lake version
    * matches the in-memory one (§4.1 staleness rule).
    */
  def liveUdf: UserDefinedFunction = {
    val bc = spark.sparkContext.broadcast(dirtyStates)
    udf { (vid: Long, version: Int) =>
      bc.value.get(vid) match {
        case None                 => version == 0
        case Some((_, true))      => false
        case Some((cur, false))   => version == cur
      }
    }
  }

  /** Live record count per posting (stale replicas and tombstones out). */
  def liveSizes(): Map[Long, Long] =
    postings
      .filter(liveUdf(col("vid"), col("version")))
      .groupBy("pid").count()
      .collect().map(r => r.getLong(0) -> r.getLong(1)).toMap

  /** Raw on-lake record count per posting (split trigger, like the block
    * mapping's length field).
    */
  def rawSizes(): Map[Long, Long] =
    postings.groupBy("pid").count()
      .collect().map(r => r.getLong(0) -> r.getLong(1)).toMap

  /** Live vector count. */
  def liveCount: Long = versions.liveIds.size.toLong

  // ---------------------------------------------------------------- updater

  /** Batch insert (the Updater, §4.1): assign each new vector to its
    * closure posting set (SPANN's boundary replication — §3.2 inserts
    * "following the original SPANN index design") via a broadcast-centroid
    * Catalyst job and append the rows to the lake. Split jobs are picked up
    * by the next [[DistRebalancer.run]].
    */
  def insertBatch(vectors: DataFrame): Unit = {
    require(centroids.nonEmpty, "insertBatch before build")
    val bc = spark.sparkContext.broadcast(centroidSnapshot)
    val eps2 = (1.0 + cfg.replicaEpsilon) * (1.0 + cfg.replicaEpsilon)
    val maxRep = cfg.maxReplicas
    val assignUdf = udf { (vec: Seq[Float]) =>
      val v = vec.toArray
      val scored = bc.value.map { case (pid, c) => (VectorMath.sqDist(v, c), pid) }.sortBy(identity)
      val dMin = scored.head._1
      scored.takeWhile(_._1 <= dMin * eps2 + 1e-12).take(maxRep).map(_._2)
    }
    val assigned = vectors.select(
      col("id").as("vid"),
      explode(assignUdf(col("vec"))).as("pid"),
      lit(0).as("version"),
      col("vec"),
    )
    // Register versions on the driver (the in-memory version map).
    vectors.select("id").collect().foreach(r => versions.register(r.getLong(0)))
    commit(postings.unionByName(assigned))
  }

  /** Batch delete: tombstones in the driver version map; physical rows are
    * GC'd by later splits (§4.1 deferred deletion).
    */
  def deleteBatch(ids: Seq[Long]): Unit = ids.foreach(versions.markDeleted)

  // --------------------------------------------------------------- searcher

  /** Distributed search: for each query, probe the nearest `probes`
    * postings, scan them, drop stale/tombstoned rows, dedupe replicas, and
    * keep the k nearest — entirely in Catalyst (explode → join → groupBy →
    * window).
    *
    * @param queries DataFrame (qid BIGINT, qvec ARRAY<FLOAT>)
    * @return DataFrame (qid, vid, rank) with rank 1..k ascending distance
    */
  def search(queries: DataFrame, k: Int, probes: Int = -1): DataFrame = {
    val nProbes = if (probes > 0) probes else cfg.searchProbes
    val bc = spark.sparkContext.broadcast(centroidSnapshot)
    val probeUdf = udf { (qvec: Seq[Float]) =>
      val q = qvec.toArray
      bc.value
        .map { case (pid, c) => (VectorMath.sqDist(q, c), pid) }
        .sortBy(identity).take(nProbes).map(_._2)
    }
    // Double arithmetic so results are bit-identical to the SQL oracle.
    val sqDistUdf = udf { (a: Seq[Float], b: Seq[Float]) =>
      var s = 0.0; var i = 0
      while (i < a.length) { val d = a(i).toDouble - b(i).toDouble; s += d * d; i += 1 }
      s
    }
    val probed = queries
      .withColumn("pid", explode(probeUdf(col("qvec"))))
    val w = org.apache.spark.sql.expressions.Window
      .partitionBy("qid").orderBy(col("d").asc, col("vid").asc)
    probed
      .join(postings, Seq("pid"))
      .filter(liveUdf(col("vid"), col("version")))
      .withColumn("dRaw", sqDistUdf(col("qvec"), col("vec")))
      .groupBy(col("qid"), col("vid")).agg(min(col("dRaw")).as("d")) // replica dedupe
      .withColumn("rank", row_number().over(w))
      .filter(col("rank") <= k)
      .select(col("qid"), col("vid"), col("rank"))
  }

  /** Records packed per simulated block, scaled so that a posting at the
    * split limit spans the paper's "three to four SSD blocks" (§4.3) — at
    * reproduction-scale split limits a literal 4 KiB block would hold whole
    * postings and hide every I/O-shape signal.
    */
  def recordsPerBlock: Int = math.max(1, math.round(cfg.splitLimit / 3.5f))

  /** Per-query I/O cost in block reads (the IOPS/latency proxy): raw sizes
    * of the probed postings at [[recordsPerBlock]] packing density.
    */
  def queryIoBlocks(queries: Seq[Array[Float]], probes: Int = -1): Seq[Long] = {
    val nProbes = if (probes > 0) probes else cfg.searchProbes
    val raw = rawSizes()
    val vpb = recordsPerBlock
    queries.map { q =>
      nearestPids(q, nProbes).map { pid =>
        math.ceil(raw.getOrElse(pid, 0L).toDouble / vpb).toLong
      }.sum
    }
  }

  /** Driver memory model (bytes) of the structures the paper keeps in DRAM. */
  def modelBytes: Long = {
    val vpb = recordsPerBlock
    val blocksPerPosting = rawSizes().valuesIterator
      .map(n => math.ceil(n.toDouble / vpb).toInt).toSeq
    repro.metrics.ResourceModel.clusterIndexBytes(
      centroids.size.toLong, dim, versions.size.toLong, blocksPerPosting)
  }
}

object DistIndex {

  /** Initial balanced build (SPANN §3.1 as a lake job): centroids come from
    * hierarchical balanced clustering on the driver (the paper builds them
    * centrally too — they are the in-DRAM metadata); the closure-replica
    * assignment of every vector is a broadcast+explode Catalyst job.
    *
    * @param vectors DataFrame (id BIGINT, vec ARRAY<FLOAT>)
    */
  def build(
      spark: SparkSession,
      rootDir: String,
      vectors: DataFrame,
      dim: Int,
      cfg: LireConfig = LireConfig(),
      seed: Long = 0,
  ): DistIndex = {
    val idx = new DistIndex(spark, rootDir, dim, cfg)
    val local = vectors.select("id", "vec").collect()
      .map(r => (r.getLong(0), r.getSeq[Float](1).toArray))
    // Two-pass build (see SpFreshEngine.buildInitial): a probe pass measures
    // closure-replica inflation, the real pass sizes primary partitions so
    // replicated postings land under the split limit; the post-build
    // rebalance splits any stragglers so the index starts LIRE-compliant.
    val probe = HierarchicalBuild.build(
      local.map(_._2).toIndexedSeq,
      targetSize = math.max(1, (cfg.splitLimit * 0.6).toInt),
      eps = cfg.replicaEpsilon,
      maxReplicas = cfg.maxReplicas,
      seed = seed,
    )
    val inflation =
      math.max(1.0, probe.memberships.iterator.map(_.length).sum.toDouble / local.length)
    val layout =
      if (inflation <= 1.5) probe
      else HierarchicalBuild.build(
        local.map(_._2).toIndexedSeq,
        targetSize = math.max(1, (cfg.splitLimit * 0.8 / inflation).toInt),
        eps = cfg.replicaEpsilon,
        maxReplicas = cfg.maxReplicas,
        seed = seed,
      )
    val partToPid = layout.centroids.indices.map(part => part -> idx.freshPid()).toMap
    layout.centroids.indices.foreach(part => idx.centroids.update(partToPid(part), layout.centroids(part)))
    local.foreach { case (vid, _) => idx.versions.register(vid) }

    // Replica assignment as a Catalyst job: broadcast centroids, emit one
    // row per (vector, member posting).
    val bc = spark.sparkContext.broadcast(
      partToPid.map { case (part, pid) => (pid, layout.centroids(part)) }.toArray)
    val eps2 = (1.0 + cfg.replicaEpsilon) * (1.0 + cfg.replicaEpsilon)
    val maxRep = cfg.maxReplicas
    val membershipUdf = udf { (vec: Seq[Float]) =>
      val v = vec.toArray
      val scored = bc.value.map { case (pid, c) => (VectorMath.sqDist(v, c), pid) }.sortBy(identity)
      val dMin = scored.head._1
      scored.takeWhile(_._1 <= dMin * eps2 + 1e-12).take(maxRep).map(_._2)
    }
    val rows = vectors.select(
      col("id").as("vid"),
      explode(membershipUdf(col("vec"))).as("pid"),
      lit(0).as("version"),
      col("vec"),
    )
    idx.commit(rows)
    new DistRebalancer(idx).run()
    idx
  }
}
