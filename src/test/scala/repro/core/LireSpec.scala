package repro.core

import scala.util.Random

import repro.SparkSpec
import repro.core.VectorMath.sqDist

/** Tests of LIRE's two necessary conditions (§3.3) including the paper's
  * Figure 4 geometry and a randomized *necessity* property: a vector the
  * conditions skip is provably never NPA-violating.
  */
class LireSpec extends SparkSpec {
  private val cfg = LireConfig()

  // Figure 4 geometry in 2-D: posting A at origin splits into A1/A2; B nearby.
  private val oldA = Array(0f, 0f)
  private val a1 = Array(-2f, 0f)
  private val a2 = Array(2f, 0f)
  private val b = Array(5f, 0f)

  test("Fig 4: the yellow dot (in split posting, closer to B than to A2) passes condition 1") {
    val yellow = Array(3.4f, 0f) // d(old)=3.4, d(A1)=5.4, d(A2)=1.4 -> cond1 false
    // yellow is closer to A2 than to old A, so condition 1 correctly skips it
    assert(!Lire.condition1(yellow, oldA, Seq(a1, a2)))
    // but a point equidistant-or-closer to old A than to both new centroids is flagged
    val mid = Array(0f, 3f)
    assert(Lire.condition1(mid, oldA, Seq(a1, a2)))
  }

  test("Fig 4: the green dot (in posting B, now closer to A2) passes condition 2") {
    val green = Array(3.2f, 0f)
    // d(green, A2) = 1.2 <= d(green, oldA) = 3.2 — must be checked
    assert(Lire.condition2(green, oldA, Seq(a1, a2)))
    // after checking, it is indeed closer to A2 than to its home B
    assert(sqDist(green, a2) < sqDist(green, b))
  }

  test("condition 1 is true when old centroid dominates both new ones") {
    val v = Array(0f, 10f)
    assert(Lire.condition1(v, oldA, Seq(a1, a2)))
  }

  test("condition 1 is false when a new centroid is strictly closer") {
    val v = Array(2.1f, 0f)
    assert(!Lire.condition1(v, oldA, Seq(a1, a2)))
  }

  test("condition 2 is false when both new centroids are farther than old") {
    val v = Array(-10f, 0f)
    // d(v,a1)=64, d(v,a2)=144, d(v,old)=100 — a1 IS closer, flip the example
    assert(Lire.condition2(v, oldA, Seq(a1, a2)))
    val u = Array(0f, -1f) // d(old)=1; d(a1)=d(a2)=5
    assert(!Lire.condition2(u, oldA, Seq(a1, a2)))
  }

  test("conditions are exhaustive on the split posting: skipping is safe") {
    // Necessity (§3.3): if condition 1 fails for v in the old posting, then
    // NO pre-split-NPA-compliant neighbor centroid can beat the new ones.
    val rnd = new Random(7)
    (1 to 200).foreach { _ =>
      val dim = 4
      val old0 = Array.fill(dim)(rnd.nextFloat() * 10)
      val n1 = Array.fill(dim)(rnd.nextFloat() * 10)
      val n2 = Array.fill(dim)(rnd.nextFloat() * 10)
      val v = Array.fill(dim)(rnd.nextFloat() * 10)
      if (!Lire.condition1(v, old0, Seq(n1, n2))) {
        // v was NPA-assigned to old posting: any neighbor B has d(v,B) >= d(v,old0).
        val dNewBest = math.min(sqDist(v, n1), sqDist(v, n2))
        // A neighbor satisfying the NPA precondition cannot beat the new best:
        val bFar = Array.fill(dim)(rnd.nextFloat() * 10)
        if (sqDist(v, bFar) >= sqDist(v, old0)) {
          assert(sqDist(v, bFar) >= dNewBest || sqDist(v, old0) > dNewBest,
            "skipped vector would have needed reassignment")
        }
      }
    }
  }

  test("conditions are exhaustive on neighbor postings: skipping is safe") {
    // Necessity: if condition 2 fails for v outside the old posting, both new
    // centroids are farther than old, which NPA already ruled out as v's home.
    val rnd = new Random(13)
    (1 to 200).foreach { _ =>
      val dim = 4
      val old0 = Array.fill(dim)(rnd.nextFloat() * 10)
      val n1 = Array.fill(dim)(rnd.nextFloat() * 10)
      val n2 = Array.fill(dim)(rnd.nextFloat() * 10)
      val v = Array.fill(dim)(rnd.nextFloat() * 10)
      val home = Array.fill(dim)(rnd.nextFloat() * 10)
      // NPA precondition for v living in `home` rather than old posting:
      if (sqDist(v, home) <= sqDist(v, old0) && !Lire.condition2(v, old0, Seq(n1, n2))) {
        assert(sqDist(v, home) < math.min(sqDist(v, n1), sqDist(v, n2)),
          "skipped neighbor vector would have preferred a new posting")
      }
    }
  }

  test("needsSplit fires strictly above the limit") {
    assert(!Lire.needsSplit(cfg.splitLimit, cfg))
    assert(Lire.needsSplit(cfg.splitLimit + 1, cfg))
  }

  test("needsMerge fires strictly below the threshold") {
    assert(!Lire.needsMerge(cfg.mergeThreshold, cfg))
    assert(Lire.needsMerge(cfg.mergeThreshold - 1, cfg))
  }

  test("reassignImproves requires a strict improvement") {
    val v = Array(0f)
    assert(Lire.reassignImproves(v, Array(5f), Array(1f)))
    assert(!Lire.reassignImproves(v, Array(1f), Array(1f)))
    assert(!Lire.reassignImproves(v, Array(1f), Array(5f)))
  }

  test("LireConfig rejects nonsensical parameters") {
    intercept[IllegalArgumentException](LireConfig(splitLimit = 1))
    intercept[IllegalArgumentException](LireConfig(mergeThreshold = 200, splitLimit = 100))
    intercept[IllegalArgumentException](LireConfig(reassignRange = -1))
    intercept[IllegalArgumentException](LireConfig(maxReplicas = 0))
  }
}
