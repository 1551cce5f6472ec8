package repro.core.distributed

import org.apache.spark.sql.{DataFrame, Dataset}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

import repro.cluster.BalancedKMeans
import repro.core.{Lire, VectorMath}

/** Per-split output row produced inside executors: the vector's side of the
  * balanced 2-means (`side = -1` when garbage-collection alone brought the
  * posting back under the limit), plus the two fresh centroids (repeated on
  * every row of the group so the driver can read them back without a second
  * pass over the vectors).
  */
final case class SplitOut(
    oldPid: Long,
    side: Int,
    vid: Long,
    version: Int,
    vec: Array[Float],
    c0: Array[Float],
    c1: Array[Float],
)

/** Totals of one [[DistRebalancer.run]] — the distributed analogue of
  * [[repro.core.engine.EngineStats]].
  */
final case class RebalanceStats(
    rounds: Int,
    splits: Long,
    gcOnlySplits: Long,
    merges: Long,
    reassignChecked: Long,
    reassignMoved: Long,
)

/** The Local Rebuilder (§4.2) as Spark jobs over the Parquet posting lake.
  *
  * One `run` executes split → reassign → merge rounds until the index is
  * balanced again: oversized postings are garbage-collected and split with
  * balanced 2-means *inside executors* (`groupByKey.flatMapGroups`), LIRE's
  * two necessary conditions (Eq. 1 on the split posting, Eq. 2 on the
  * reassign-range neighbors) select reassignment candidates as DataFrame
  * filters, and surviving moves append fresh-version rows while the stale
  * replicas await the next GC. Convergence of the loop is the paper's §3.4
  * theorem — each round strictly increases the centroid count, bounded by
  * the number of live vectors.
  */
final class DistRebalancer(idx: DistIndex) {
  import idx.spark
  private val cfg = idx.cfg

  /** Rebalance to a stable state (or `maxRounds`). */
  def run(maxRounds: Int = 50): RebalanceStats = {
    var rounds = 0
    var splits = 0L; var gcOnly = 0L; var merges = 0L
    var checked = 0L; var moved = 0L
    var progress = true
    while (progress && rounds < maxRounds) {
      val s = splitRound()
      val m = mergeRound()
      splits += s._1; gcOnly += s._2; checked += s._3; moved += s._4
      merges += m._1; checked += m._2; moved += m._3
      progress = (s._1 + s._2 + m._1) > 0
      rounds += 1
    }
    RebalanceStats(rounds, splits, gcOnly, merges, checked, moved)
  }

  /** One split round over every currently oversized posting.
    *
    * @return (splitsExecuted, gcOnlySplits, candidatesChecked, vectorsMoved)
    */
  private def splitRound(): (Long, Long, Long, Long) = {
    import spark.implicits._
    val oversized = idx.rawSizes().filter { case (_, n) => Lire.needsSplit(n.toInt, cfg) }.keySet
    if (oversized.isEmpty) return (0, 0, 0, 0)

    val preCentroids = idx.centroidSnapshot // before this round touches anything
    val live = idx.liveUdf
    val splitLimit = cfg.splitLimit
    val oversizedSeq = oversized.toSeq

    // GC + balanced 2-means per oversized posting, inside executors.
    val splitOut: Dataset[SplitOut] = idx.postings
      .filter(col("pid").isin(oversizedSeq: _*))
      .filter(live(col("vid"), col("version")))
      .as[PostingRow]
      .groupByKey(_.pid)
      .flatMapGroups { (pid, it) =>
        val rows = it.toVector.groupBy(_.vid).valuesIterator.map(_.head).toVector
        if (rows.length <= splitLimit) {
          // GC alone fixed it: write back, keep pid and centroid (§4.2.1).
          val empty = Array.empty[Float]
          rows.iterator.map(r => SplitOut(pid, -1, r.vid, r.version, r.vec, empty, empty))
        } else {
          val r = BalancedKMeans.split2(rows.map(_.vec), seed = pid)
          val sides = rows.indices.groupBy(r.assignment(_))
          val (part0, part1) =
            if (sides.size < 2) rows.splitAt(rows.length / 2)
            else (sides(0).map(rows(_)).toVector, sides(1).map(rows(_)).toVector)
          val c0 = VectorMath.mean(part0.map(_.vec))
          val c1 = VectorMath.mean(part1.map(_.vec))
          part0.iterator.map(r => SplitOut(pid, 0, r.vid, r.version, r.vec, c0, c1)) ++
            part1.iterator.map(r => SplitOut(pid, 1, r.vid, r.version, r.vec, c0, c1))
        }
      }
      .persist()

    // Driver reads back one metadata row per posting: did it split, and into
    // which centroids.
    val meta = splitOut
      .groupBy(col("oldPid"))
      .agg(max(col("side")).as("maxSide"), first(col("c0")).as("c0"), first(col("c1")).as("c1"))
      .collect()
      .map(r => (r.getLong(0), r.getInt(1),
        r.getSeq[Float](2).toArray, r.getSeq[Float](3).toArray))

    val splitPids = meta.collect { case (pid, maxSide, _, _) if maxSide >= 0 => pid }.toSet
    val gcOnlyCount = meta.length - splitPids.size

    // Allocate fresh pids; update the driver centroid map (§4.1: "update the
    // memory SPTAG index with the new posting centroids").
    val newPids: Map[Long, (Long, Long)] = meta.collect {
      case (pid, maxSide, _, _) if maxSide >= 0 => pid -> ((idx.freshPid(), idx.freshPid()))
    }.toMap
    val splitInfo: Map[Long, (Array[Float], Array[Float], Array[Float])] = meta.collect {
      case (pid, maxSide, c0, c1) if maxSide >= 0 =>
        pid -> ((idx.centroids(pid), c0, c1))
    }.toMap
    splitInfo.foreach { case (pid, (_, c0, c1)) =>
      val (p0, p1) = newPids(pid)
      idx.centroids.subtractOne(pid)
      idx.centroids.update(p0, c0)
      idx.centroids.update(p1, c1)
    }

    // Relabel split rows to their new posting ids (GC-only rows keep theirs).
    val bcNew = spark.sparkContext.broadcast(newPids)
    val relabelUdf = udf { (oldPid: Long, side: Int) =>
      if (side < 0) oldPid
      else { val (p0, p1) = bcNew.value(oldPid); if (side == 0) p0 else p1 }
    }
    val relabeled = splitOut
      .withColumn("pid", relabelUdf(col("oldPid"), col("side")))
      .select(col("vid"), col("pid"), col("version"), col("vec"))

    val kept = idx.postings.filter(!col("pid").isin(oversizedSeq: _*))
      .select(col("vid"), col("pid"), col("version"), col("vec"))
    val afterSplit = kept.unionByName(relabeled)

    // ---- reassign candidates -------------------------------------------
    // Condition 1 (Eq. 1): vectors of the split postings themselves.
    val bcInfo = spark.sparkContext.broadcast(splitInfo)
    val cond1Udf = udf { (oldPid: Long, vec: Seq[Float]) =>
      bcInfo.value.get(oldPid) match {
        case None => false
        case Some((oldC, c0, c1)) => Lire.condition1(vec.toArray, oldC, Seq(c0, c1))
      }
    }
    val cand1 = splitOut
      .filter(col("side") >= 0)
      .filter(cond1Udf(col("oldPid"), col("vec")))
      .withColumn("fromPid", relabelUdf(col("oldPid"), col("side")))
      .select(col("vid"), col("fromPid"), col("version"), col("vec"))

    // Condition 2 (Eq. 2): vectors in the reassign range of each split —
    // the old centroid's nearest postings, excluding postings split this
    // round (their vectors already went through condition 1).
    val neighborMap: Map[Long, Seq[Long]] =
      if (cfg.reassignRange == 0) Map.empty
      else splitInfo.map { case (pid, (oldC, _, _)) =>
        val nbrs = preCentroids
          .filter { case (p, _) => !splitPids.contains(p) }
          .map { case (p, c) => (VectorMath.sqDist(oldC, c), p) }
          .sortBy(identity).take(cfg.reassignRange).map(_._2).toSeq
        pid -> nbrs
      }
    val neighborToSplits: Map[Long, Seq[Long]] =
      neighborMap.toSeq.flatMap { case (sp, nbrs) => nbrs.map(_ -> sp) }
        .groupMap(_._1)(_._2)
    val cand2 =
      if (neighborToSplits.isEmpty) spark.emptyDataFrame.select()
      else {
        val bcNbr = spark.sparkContext.broadcast(neighborToSplits)
        val cond2Udf = udf { (pid: Long, vec: Seq[Float]) =>
          bcNbr.value.get(pid) match {
            case None => false
            case Some(sps) =>
              val v = vec.toArray
              sps.exists { sp =>
                val (oldC, c0, c1) = bcInfo.value(sp)
                Lire.condition2(v, oldC, Seq(c0, c1))
              }
          }
        }
        idx.postings
          .filter(col("pid").isin(neighborToSplits.keys.toSeq: _*))
          .filter(live(col("vid"), col("version")))
          .filter(cond2Udf(col("pid"), col("vec")))
          .select(col("vid"), col("pid").as("fromPid"), col("version"), col("vec"))
      }
    val candidates = if (neighborToSplits.isEmpty) cand1 else cand1.unionByName(cand2)

    val (checked, movedCount, withMoves) = applyReassigns(candidates, afterSplit)
    idx.commit(withMoves)
    splitOut.unpersist()
    (splitPids.size.toLong, gcOnlyCount.toLong, checked, movedCount)
  }

  /** One merge round over every undersized posting (§3.2 Merge).
    *
    * @return (merges, candidatesChecked, vectorsMoved)
    */
  private def mergeRound(): (Long, Long, Long) = {
    val liveSz = idx.liveSizes()
    // A posting can be all-stale (size 0 after reassigns): still merge it away.
    val allPids = idx.centroids.keys.toSet
    val undersized = allPids
      .filter(p => Lire.needsMerge(liveSz.getOrElse(p, 0L).toInt, cfg))
    if (undersized.isEmpty || idx.centroids.size < 2) return (0, 0, 0)

    // Plan merges on the driver: each undersized posting folds into its
    // nearest surviving posting; postings already consumed or used as a
    // target this round are skipped (no chains within a round).
    val consumed = scala.collection.mutable.Set.empty[Long]
    val targets = scala.collection.mutable.Set.empty[Long]
    val plan = scala.collection.mutable.Map.empty[Long, Long]
    undersized.toSeq.sorted.foreach { pid =>
      if (!consumed(pid) && !targets(pid) && idx.centroids.size - consumed.size > 1) {
        val c = idx.centroids(pid)
        val near = idx.centroids.toSeq
          .filter { case (p, _) => p != pid && !consumed(p) }
          .map { case (p, cc) => (VectorMath.sqDist(c, cc), p) }
          .sorted.headOption
        near.foreach { case (_, target) =>
          plan.update(pid, target)
          consumed += pid
          targets += target
        }
      }
    }
    if (plan.isEmpty) return (0, 0, 0)

    val live = idx.liveUdf
    val bcPlan = spark.sparkContext.broadcast(plan.toMap)
    val mergedPids = plan.keys.toSeq
    val relabelUdf = udf { (pid: Long) => bcPlan.value.getOrElse(pid, pid) }

    // The deleted posting's live rows are appended to the target (§3.2);
    // its stale rows are GC'd by the rewrite.
    val movedIn = idx.postings
      .filter(col("pid").isin(mergedPids: _*))
      .filter(live(col("vid"), col("version")))
      .select(col("vid"), relabelUdf(col("pid")).as("pid"), col("version"), col("vec"))
      .persist()
    val kept = idx.postings.filter(!col("pid").isin(mergedPids: _*))
      .select(col("vid"), col("pid"), col("version"), col("vec"))
    val afterMerge = kept.unionByName(movedIn)

    plan.keys.foreach(idx.centroids.subtractOne)

    // §3.3: vectors from the deleted posting all need a reassign check.
    val candidates = movedIn.select(col("vid"), col("pid").as("fromPid"), col("version"), col("vec"))
    val (checked, movedCount, withMoves) = applyReassigns(candidates, afterMerge)
    idx.commit(withMoves)
    movedIn.unpersist()
    (plan.size.toLong, checked, movedCount)
  }

  /** Final NPA check + execution for reassign candidates (§3.3): search each
    * candidate's nearest posting against the *updated* centroid set, drop
    * false positives (no strict improvement), CAS-bump versions on the
    * driver, and append fresh-version rows. Old replicas everywhere become
    * stale via the version map — no in-place deletes, exactly the paper's
    * replica story.
    *
    * @return (candidatesChecked, moved, newPostingsDf)
    */
  private def applyReassigns(
      candidates: DataFrame,
      base: DataFrame,
  ): (Long, Long, DataFrame) = {
    val bcC = spark.sparkContext.broadcast(idx.centroidSnapshot)
    // A vid may be a candidate from several postings (replicas): keep the
    // one closest to its current home — the primary — for the NPA check.
    val homeDistUdf = udf { (fromPid: Long, vec: Seq[Float]) =>
      val v = vec.toArray
      bcC.value.collectFirst { case (p, c) if p == fromPid => VectorMath.sqDist(v, c) }
        .getOrElse(Double.MaxValue)
    }
    val bestUdf = udf { (vec: Seq[Float]) =>
      val v = vec.toArray
      var bestPid = -1L; var bestD = Double.MaxValue
      bcC.value.foreach { case (pid, c) =>
        val d = VectorMath.sqDist(v, c)
        if (d < bestD || (d == bestD && pid < bestPid)) { bestD = d; bestPid = pid }
      }
      bestPid
    }
    val w = Window.partitionBy("vid").orderBy(col("homeD").asc, col("fromPid").asc)
    val scored = candidates
      .withColumn("homeD", homeDistUdf(col("fromPid"), col("vec")))
      .withColumn("rk", row_number().over(w))
      .filter(col("rk") === 1)
      .withColumn("bestPid", bestUdf(col("vec")))
    val checked = scored.count()
    val moves = scored
      .filter(col("bestPid") =!= col("fromPid"))
      .withColumn("bestD", homeDistUdf(col("bestPid"), col("vec")))
      .filter(col("bestD") < col("homeD")) // strict improvement (§3.3)
      .select(col("vid"), col("bestPid"), col("version"), col("vec"))
      .collect()

    // Driver-side CAS version bumps (§4.2.2); losers abort silently. The
    // move writes through the closure rule (boundary replicas preserved).
    val eps2 = (1.0 + cfg.replicaEpsilon) * (1.0 + cfg.replicaEpsilon)
    val movedRows = moves.flatMap { r =>
      val vid = r.getLong(0)
      idx.versions.tryBumpVersion(vid, r.getInt(2)).toSeq.flatMap { newVer =>
        val v = r.getSeq[Float](3).toArray
        val scored = idx.centroidSnapshot
          .map { case (pid, c) => (VectorMath.sqDist(v, c), pid) }.sortBy(identity)
        val dMin = scored.head._1
        scored.takeWhile(_._1 <= dMin * eps2 + 1e-12).take(cfg.maxReplicas)
          .map { case (_, pid) => PostingRow(vid, pid, newVer, v) }
      }
    }.toSeq
    import spark.implicits._
    val out =
      if (movedRows.isEmpty) base
      else base.unionByName(movedRows.toDF().select(col("vid"), col("pid"), col("version"), col("vec")))
    (checked, movedRows.map(_.vid).distinct.size.toLong, out)
  }
}
