package repro.data

import repro.SparkSpec
import repro.core.VectorMath

/** Synthetic dataset generator checks: determinism, dimensionality, the
  * stationary-vs-shifted regimes, and epoch mechanics.
  */
class VectorGenSpec extends SparkSpec {
  private val dim = 8

  test("mixture draws have the configured dimensionality") {
    val mix = VectorGen.mixture(dim, nClusters = 5, seed = 1)
    VectorGen.draw(mix, 20, 0, seed = 2).foreach(v => assert(v.vec.length == dim))
  }

  test("generation is deterministic in the seed") {
    val mix = VectorGen.mixture(dim, 5, seed = 1)
    val a = VectorGen.draw(mix, 50, 0, seed = 9)
    val b = VectorGen.draw(mix, 50, 0, seed = 9)
    a.zip(b).foreach { case (x, y) => assert(x.vec.toSeq == y.vec.toSeq && x.id == y.id) }
  }

  test("different seeds produce different vectors") {
    val mix = VectorGen.mixture(dim, 5, seed = 1)
    val a = VectorGen.draw(mix, 10, 0, seed = 1)
    val b = VectorGen.draw(mix, 10, 0, seed = 2)
    assert(a.map(_.vec.toSeq) != b.map(_.vec.toSeq))
  }

  test("ids are assigned consecutively from idStart") {
    val mix = VectorGen.mixture(dim, 3, seed = 1)
    val vs = VectorGen.draw(mix, 10, idStart = 100, seed = 1)
    assert(vs.map(_.id) == (100L until 110L))
  }

  test("draws cluster around mixture centers") {
    val mix = VectorGen.mixture(dim, 4, seed = 3, sigma = 1.0)
    val vs = VectorGen.draw(mix, 200, 0, seed = 4)
    // Every draw is within a few sigma of some center.
    vs.foreach { v =>
      val dMin = mix.centers.map(c => VectorMath.dist(v.vec, c)).min
      assert(dMin < 8 * math.sqrt(dim.toDouble), s"point too far from every center: $dMin")
    }
  }

  test("shifted mixture skews cluster weights (SPACEV-like regime)") {
    val base = VectorGen.mixture(dim, 10, seed = 5)
    val shift = VectorGen.shifted(base, seed = 6)
    val draws = VectorGen.draw(shift, 2000, 0, seed = 7)
    // Count draws by nearest shifted center: the top cluster must dominate
    // far beyond the uniform share (Zipf alpha=1.5 gives >40% to rank 1).
    val counts = draws
      .groupBy(v => shift.centers.indices.minBy(i => VectorMath.sqDist(v.vec, shift.centers(i))))
      .view.mapValues(_.size).toMap
    assert(counts.values.max > 2000 / 10 * 2, "shifted regime should concentrate inserts")
  }

  test("stationary pool keeps cluster shares roughly uniform (SIFT-like regime)") {
    val base = VectorGen.mixture(dim, 10, seed = 5, sigma = 1.0)
    val draws = VectorGen.draw(base, 2000, 0, seed = 8)
    val counts = draws
      .groupBy(v => base.centers.indices.minBy(i => VectorMath.sqDist(v.vec, base.centers(i))))
      .view.mapValues(_.size).toMap
    assert(counts.values.max < 2000 / 10 * 3, "uniform mixture should not concentrate")
  }

  test("epoch deletes the requested share and inserts equally many") {
    val mix = VectorGen.mixture(dim, 5, seed = 1)
    val live = (0L until 1000L).toIndexedSeq
    val (dels, ins) = VectorGen.epoch(live, mix, rate = 0.01, nextId = 5000L, seed = 3)
    assert(dels.length == 10 && ins.length == 10)
    assert(dels.toSet.subsetOf(live.toSet))
    assert(ins.map(_.id) == (5000L until 5010L))
  }

  test("epoch deletions are distinct") {
    val mix = VectorGen.mixture(dim, 5, seed = 1)
    val (dels, _) = VectorGen.epoch((0L until 100L).toIndexedSeq, mix, 0.2, 1000L, seed = 4)
    assert(dels.distinct.length == dels.length)
  }

  test("queries are in-distribution and deterministic") {
    val mix = VectorGen.mixture(dim, 5, seed = 1)
    val q1 = VectorGen.queries(mix, 10, seed = 11)
    val q2 = VectorGen.queries(mix, 10, seed = 11)
    assert(q1.map(_.toSeq) == q2.map(_.toSeq))
    assert(q1.forall(_.length == dim))
  }

  test("toDf round-trips ids and vectors through Spark") {
    val mix = VectorGen.mixture(dim, 3, seed = 1)
    val vs = VectorGen.draw(mix, 20, 0, seed = 1)
    val df = VectorGen.toDf(spark, vs)
    assert(df.columns.toSeq == Seq("id", "vec"))
    val back = df.collect().map(r => (r.getLong(0), r.getSeq[Float](1).toArray)).sortBy(_._1)
    back.zip(vs.sortBy(_.id)).foreach { case ((id, vec), v) =>
      assert(id == v.id && vec.toSeq == v.vec.toSeq)
    }
  }

  test("mixture weights must align with centers") {
    intercept[IllegalArgumentException] {
      VectorGen.Mixture(IndexedSeq(Array(1f)), IndexedSeq(1.0, 2.0), 1.0)
    }
  }
}
