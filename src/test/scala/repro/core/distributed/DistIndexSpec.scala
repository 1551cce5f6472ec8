package repro.core.distributed

import java.nio.file.Files

import repro.{Oracle, SparkSpec}
import repro.core.{LireConfig, VectorMath}
import repro.data.{GroundTruth, VectorGen}

/** Distributed index: build, batch updates, the Catalyst search pipeline,
  * and DuckDB oracle equivalence of exhaustive search.
  */
class DistIndexSpec extends SparkSpec {
  private val dim = 4
  private val cfg = LireConfig(splitLimit = 32, mergeThreshold = 4, reassignRange = 8,
    searchProbes = 8)

  private def mix(seed: Long = 1) = VectorGen.mixture(dim, 4, seed)

  private def fresh(n: Int, seed: Long = 1): (DistIndex, IndexedSeq[VectorGen.Vec]) = {
    val base = VectorGen.draw(mix(seed), n, 0, seed + 1)
    val root = Files.createTempDirectory("distidx").toString
    val idx = DistIndex.build(spark, root, VectorGen.toDf(spark, base), dim, cfg, seed = seed)
    (idx, base)
  }

  test("build commits a posting lake with every vector present") {
    val (idx, base) = fresh(200)
    val vids = idx.postings.select("vid").distinct().collect().map(_.getLong(0)).toSet
    assert(vids == base.map(_.id).toSet)
  }

  test("build postings respect the split limit (live sizes)") {
    val (idx, _) = fresh(300)
    assert(idx.liveSizes().values.forall(_ <= cfg.splitLimit))
  }

  test("every vector's primary (nearest) centroid hosts one of its replicas") {
    val (idx, base) = fresh(200)
    val membership = idx.postings.select("vid", "pid").collect()
      .groupBy(_.getLong(0)).view.mapValues(_.map(_.getLong(1)).toSet).toMap
    base.foreach { v =>
      val nearest = idx.nearestPids(v.vec, 1).head
      assert(membership(v.id).contains(nearest), s"vid ${v.id} missing from nearest posting")
    }
  }

  test("insertBatch closure-assigns new vectors, always including the nearest posting") {
    val (idx, _) = fresh(200)
    val ins = VectorGen.draw(mix(), 30, 10000, seed = 5)
    idx.insertBatch(VectorGen.toDf(spark, ins))
    val got = idx.postings.filter("vid >= 10000").select("vid", "pid").collect()
      .groupBy(_.getLong(0)).view.mapValues(_.map(_.getLong(1)).toSet).toMap
    ins.foreach { v =>
      assert(got(v.id).contains(idx.nearestPids(v.vec, 1).head))
      assert(got(v.id).size <= cfg.maxReplicas)
    }
  }

  test("deleteBatch hides vectors from search") {
    val (idx, base) = fresh(200)
    val victims = base.take(10).map(_.id)
    idx.deleteBatch(victims)
    import spark.implicits._
    val queries = base.take(10).map(v => (v.id, v.vec)).toDF("qid", "qvec")
    val res = idx.search(queries, k = 5, probes = idx.centroidSnapshot.length)
    val found = res.select("vid").collect().map(_.getLong(0)).toSet
    assert(found.intersect(victims.toSet).isEmpty)
  }

  test("search recall vs exact ground truth is high") {
    val (idx, base) = fresh(400)
    import spark.implicits._
    val qs = VectorGen.queries(mix(), 20, seed = 7)
    val queries = qs.zipWithIndex.map { case (q, i) => (i.toLong, q) }.toDF("qid", "qvec")
    val res = idx.search(queries, k = 10)
    val got = res.collect().map(r => (r.getLong(0), r.getLong(1), r.getInt(2)))
      .groupBy(_._1).view.mapValues(_.sortBy(_._3).map(_._2).toSeq).toMap
    val data = base.map(v => (v.id, v.vec))
    val recalls = qs.zipWithIndex.map { case (q, i) =>
      GroundTruth.recall(got.getOrElse(i.toLong, Seq.empty), GroundTruth.topK(q, data, 10))
    }
    val mean = recalls.sum / recalls.length
    assert(mean >= 0.9, s"distributed search recall too low: $mean")
  }

  test("oracle: exhaustive-probe search equals DuckDB brute-force top-k") {
    val (idx, base) = fresh(80, seed = 3)
    import spark.implicits._
    val qs = VectorGen.queries(mix(3), 5, seed = 11)
    val queries = qs.zipWithIndex.map { case (q, i) => (i.toLong, q) }.toDF("qid", "qvec")
    // Probing every posting makes cluster search exhaustive = brute force.
    val sparkOut = idx.search(queries, k = 5, probes = idx.centroidSnapshot.length)

    val dataFlat = base.map(v =>
      (v.id, v.vec(0).toDouble, v.vec(1).toDouble, v.vec(2).toDouble, v.vec(3).toDouble))
      .toDF("id", "x0", "x1", "x2", "x3")
    val qFlat = qs.zipWithIndex.map { case (q, i) =>
      (i.toLong, q(0).toDouble, q(1).toDouble, q(2).toDouble, q(3).toDouble) }
      .toDF("qid", "q0", "q1", "q2", "q3")
    val sq = (i: Int) => s"(CAST(q.q$i AS DOUBLE)-CAST(d.x$i AS DOUBLE))*(CAST(q.q$i AS DOUBLE)-CAST(d.x$i AS DOUBLE))"
    val sql =
      s"""SELECT qid, vid, rank FROM (
         |  SELECT q.qid AS qid, d.id AS vid,
         |    ROW_NUMBER() OVER (PARTITION BY q.qid
         |      ORDER BY ${sq(0)}+${sq(1)}+${sq(2)}+${sq(3)}, CAST(d.id AS BIGINT)) AS rank
         |  FROM queries q CROSS JOIN data d) t
         |WHERE rank <= 5""".stripMargin
    Oracle.assertEquivalent(sparkOut, sql, "data" -> dataFlat, "queries" -> qFlat)
  }

  test("oracle: live posting sizes equal a DuckDB group-by") {
    val (idx, _) = fresh(120, seed = 5)
    import spark.implicits._
    val sparkSizes = idx.postings
      .filter(idx.liveUdf(org.apache.spark.sql.functions.col("vid"),
        org.apache.spark.sql.functions.col("version")))
      .groupBy("pid").count().withColumnRenamed("count", "n")
    val flat = idx.postings.select("vid", "pid", "version").collect()
      .map(r => (r.getLong(0), r.getLong(1), r.getInt(2)))
      .toSeq.toDF("vid", "pid", "version")
    // All vectors are fresh (version 0, no deletes): live == all rows.
    val sql = "SELECT pid, COUNT(*) AS n FROM rows GROUP BY pid"
    Oracle.assertEquivalent(sparkSizes, sql, "rows" -> flat)
  }

  test("queryIoBlocks reflects posting growth") {
    val (idx, _) = fresh(300, seed = 7)
    val hot = VectorGen.Mixture(IndexedSeq(mix(7).centers.head), IndexedSeq(1.0), 2.0)
    val q = hot.centers.head
    val before = idx.queryIoBlocks(Seq(q), probes = 4).head
    idx.insertBatch(VectorGen.toDf(spark, VectorGen.draw(hot, 200, 10000, seed = 13)))
    val after = idx.queryIoBlocks(Seq(q), probes = 4).head
    assert(after > before, "hot-region inserts must increase probe cost pre-rebalance")
  }

  test("modelBytes accounts centroids, versions, and mapping") {
    val (idx, _) = fresh(200, seed = 9)
    assert(idx.modelBytes > 0)
    val before = idx.modelBytes
    idx.insertBatch(VectorGen.toDf(spark, VectorGen.draw(mix(9), 100, 20000, seed = 17)))
    assert(idx.modelBytes > before)
  }

  test("commits create immutable new versions") {
    val (idx, _) = fresh(100, seed = 11)
    val c0 = idx.commits
    idx.insertBatch(VectorGen.toDf(spark, VectorGen.draw(mix(11), 10, 30000, seed = 19)))
    assert(idx.commits == c0 + 1)
  }
}
