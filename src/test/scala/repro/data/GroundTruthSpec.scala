package repro.data

import repro.{Oracle, SparkSpec}
import repro.core.VectorMath

/** Exact-KNN ground truth: local scan, recall math, the Spark crossJoin
  * pipeline, and a DuckDB oracle equivalence check of that pipeline.
  */
class GroundTruthSpec extends SparkSpec {

  test("topK returns the exact nearest ids in order") {
    val data = Seq(1L -> Array(0f, 0f), 2L -> Array(1f, 0f), 3L -> Array(5f, 0f))
    assert(GroundTruth.topK(Array(0.9f, 0f), data, 2) == Seq(2L, 1L))
  }

  test("topK ties break by id") {
    val data = Seq(7L -> Array(1f), 3L -> Array(-1f))
    assert(GroundTruth.topK(Array(0f), data, 2) == Seq(3L, 7L))
  }

  test("recall of identical sets is 1") {
    assert(GroundTruth.recall(Seq(1L, 2L, 3L), Seq(3L, 2L, 1L)) == 1.0)
  }

  test("recall of disjoint sets is 0") {
    assert(GroundTruth.recall(Seq(1L), Seq(2L)) == 0.0)
  }

  test("recall counts partial overlap") {
    assert(GroundTruth.recall(Seq(1L, 2L, 4L, 5L), Seq(1L, 2L, 3L, 6L)) == 0.5)
  }

  test("meanRecall averages per-query recalls") {
    val r = GroundTruth.meanRecall(Seq(Seq(1L), Seq(2L)), Seq(Seq(1L), Seq(3L)))
    assert(r == 0.5)
  }

  test("meanRecall rejects mismatched batches") {
    intercept[IllegalArgumentException](GroundTruth.meanRecall(Seq(Seq(1L)), Seq.empty))
  }

  test("topKDf matches the local brute force on random data") {
    import spark.implicits._
    val rnd = new scala.util.Random(5)
    val data = (0L until 200L).map(i => (i, Array.fill(4)(rnd.nextFloat() * 10)))
    val queries = (0L until 8L).map(q => (q, Array.fill(4)(rnd.nextFloat() * 10)))
    val gotDf = GroundTruth.topKDf(
      spark,
      queries.toDF("qid", "qvec"),
      data.toDF("id", "vec"),
      k = 5,
    )
    val got = gotDf.collect()
      .map(r => (r.getLong(0), r.getLong(1), r.getInt(2)))
      .groupBy(_._1).view.mapValues(_.sortBy(_._3).map(_._2).toSeq).toMap
    queries.foreach { case (qid, q) =>
      assert(got(qid) == GroundTruth.topK(q, data, 5), s"query $qid mismatch")
    }
  }

  test("oracle: Spark crossJoin KNN pipeline equals DuckDB SQL") {
    import spark.implicits._
    val rnd = new scala.util.Random(17)
    val dim = 4
    val data = (0L until 60L).map(i => (i, Array.fill(dim)(rnd.nextFloat() * 10)))
    val queries = (0L until 5L).map(q => (q, Array.fill(dim)(rnd.nextFloat() * 10)))
    val sparkOut = GroundTruth.topKDf(
      spark, queries.toDF("qid", "qvec"), data.toDF("id", "vec"), k = 3)

    // Flatten vectors to scalar columns for the SQL oracle.
    val dataFlat = data.map { case (id, v) => (id, v(0).toDouble, v(1).toDouble, v(2).toDouble, v(3).toDouble) }
      .toDF("id", "x0", "x1", "x2", "x3")
    val qFlat = queries.map { case (id, v) => (id, v(0).toDouble, v(1).toDouble, v(2).toDouble, v(3).toDouble) }
      .toDF("qid", "q0", "q1", "q2", "q3")
    val sq = (i: Int) => s"(CAST(q.q$i AS DOUBLE)-CAST(d.x$i AS DOUBLE))*(CAST(q.q$i AS DOUBLE)-CAST(d.x$i AS DOUBLE))"
    val sql =
      s"""SELECT qid, id, rank FROM (
         |  SELECT q.qid AS qid, d.id AS id,
         |    ROW_NUMBER() OVER (PARTITION BY q.qid
         |      ORDER BY ${sq(0)}+${sq(1)}+${sq(2)}+${sq(3)}, CAST(d.id AS BIGINT)) AS rank
         |  FROM queries q CROSS JOIN data d) t
         |WHERE rank <= 3""".stripMargin
    Oracle.assertEquivalent(sparkOut, sql, "data" -> dataFlat, "queries" -> qFlat)
  }
}
