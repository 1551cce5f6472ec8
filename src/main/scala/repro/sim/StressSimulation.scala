package repro.sim

import scala.collection.mutable

import org.apache.spark.sql.SparkSession

import repro.core.LireConfig
import repro.core.distributed.{DistIndex, DistRebalancer}
import repro.data.{GroundTruth, VectorGen}
import repro.metrics.LatencyModel

/** Billion-scale stress test, scaled (§5.3, Table 3 / Fig 9): the Spark
  * distributed index under sustained 1%-per-epoch updates on a '''uniform'''
  * (SIFT-like) and a '''skew''' (SPACEV-like) dataset. Reports per-epoch
  * accuracy, per-query I/O blocks (the IOPS proxy), modelled P99.9 search
  * latency, rebalance activity, and driver memory model.
  */
object StressSimulation {

  final case class StressEpoch(
      epoch: Int,
      recall: Double,
      meanIoBlocks: Double,
      p999Ms: Double,
      splits: Long,
      merges: Long,
      reassigns: Long,
      memoryMb: Double,
      postings: Int,
  )

  final case class StressConfig(
      dim: Int = 16,
      baseN: Int = 12000,
      epochs: Int = 8,
      updateRate: Double = 0.01,
      queriesPerEpoch: Int = 30,
      k: Int = 10,
      probes: Int = 16,
      nClusters: Int = 16,
      seed: Long = 7,
      lire: LireConfig = LireConfig(splitLimit = 64, mergeThreshold = 8,
        reassignRange = 16, searchProbes = 16),
  )

  /** Run the stress workload; `skew = false` is the uniform dataset. */
  def run(spark: SparkSession, rootDir: String, cfg: StressConfig, skew: Boolean): IndexedSeq[StressEpoch] = {
    val baseMix = VectorGen.mixture(cfg.dim, cfg.nClusters, cfg.seed)
    val pool = if (skew) VectorGen.shifted(baseMix, cfg.seed + 1) else baseMix
    val base = VectorGen.draw(baseMix, cfg.baseN, 0, cfg.seed + 2)
    val idx = DistIndex.build(spark, rootDir, VectorGen.toDf(spark, base), cfg.dim, cfg.lire, cfg.seed)
    val reb = new DistRebalancer(idx)
    val live = mutable.Map.from(base.map(v => v.id -> v.vec))
    var nextId = cfg.baseN.toLong

    (1 to cfg.epochs).map { ep =>
      val (dels, ins) = VectorGen.epoch(
        live.keys.toIndexedSeq.sorted, pool, cfg.updateRate, nextId, cfg.seed + 100 + ep)
      idx.deleteBatch(dels)
      idx.insertBatch(VectorGen.toDf(spark, ins))
      dels.foreach(live.remove)
      ins.foreach(v => live.update(v.id, v.vec))
      nextId += ins.length
      val stats = reb.run()

      val qs = VectorGen.queries(pool, cfg.queriesPerEpoch, cfg.seed + 500 + ep)
      import spark.implicits._
      val queries = qs.zipWithIndex.map { case (q, i) => (i.toLong, q) }.toDF("qid", "qvec")
      val got = idx.search(queries, cfg.k, cfg.probes).collect()
        .map(r => (r.getLong(0), r.getLong(1), r.getInt(2)))
        .groupBy(_._1).view.mapValues(_.sortBy(_._3).map(_._2).toSeq).toMap
      val data = live.toSeq
      val recalls = qs.zipWithIndex.map { case (q, i) =>
        GroundTruth.recall(got.getOrElse(i.toLong, Seq.empty), GroundTruth.topK(q, data, cfg.k))
      }
      val ios = idx.queryIoBlocks(qs, cfg.probes)
      val lat = ios.map(b => math.min(LatencyModel.HardCutMs, LatencyModel.searchMs(b, 0)))

      StressEpoch(
        epoch = ep,
        recall = recalls.sum / recalls.length,
        meanIoBlocks = ios.sum.toDouble / ios.length,
        p999Ms = LatencyModel.percentile(lat, 99.9),
        splits = stats.splits,
        merges = stats.merges,
        reassigns = stats.reassignMoved,
        memoryMb = repro.metrics.ResourceModel.mb(idx.modelBytes),
        postings = idx.centroidSnapshot.length,
      )
    }
  }

  /** One-line-per-epoch rendering for job output / EXPERIMENTS.md. */
  def render(name: String, es: Seq[StressEpoch]): String = {
    val header = f"## $name%-8s | ep | recall | ioBlk | P99.9ms | splits | merges | reass | memMB | postings"
    val rows = es.map { e =>
      f"   ${e.epoch}%3d | ${e.recall}%.3f | ${e.meanIoBlocks}%6.1f | ${e.p999Ms}%6.2f | " +
        f"${e.splits}%5d | ${e.merges}%5d | ${e.reassigns}%5d | ${e.memoryMb}%6.2f | ${e.postings}%5d"
    }
    (header +: rows).mkString("\n")
  }
}
