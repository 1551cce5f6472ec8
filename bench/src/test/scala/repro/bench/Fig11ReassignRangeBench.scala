package repro.bench

import repro.SparkSpec
import repro.sim.AblationStudy

/** Fig 11 reproduction: the reassign-range parameter study. Paper shape:
  * accuracy improves as the range grows and saturates (they pick 64 of
  * ~100M postings; the sweep here is scaled to the reproduction's ~150
  * postings, where 8–16 plays 64's role).
  */
class Fig11ReassignRangeBench extends SparkSpec {
  private val baseN = sys.env.getOrElse("REPRO_BENCH_SHIFT_N", "6000").toInt

  test("Fig 11: recall grows with reassign range and saturates") {
    val cfg = AblationStudy.ShiftConfig(baseN = baseN, updateN = baseN / 3)
    val w = AblationStudy.shiftedWorkload(cfg)
    val ranges = Seq(0, 2, 4, 8, 16, 32)
    val sweep = AblationStudy.reassignRangeSweep(cfg, w, ranges, probes = 8)

    println(s"=== Fig 11, baseN=$baseN updateN=${baseN / 3}, probes=8 ===")
    sweep.foreach { case (r, rec) => println(f"range=$r%3d recall=$rec%.3f") }

    val byRange = sweep.toMap
    // Larger ranges must never hurt materially...
    assert(byRange(32) >= byRange(0) - 0.005,
      f"wide-range recall (${byRange(32)}%.3f) must not trail range-0 (${byRange(0)}%.3f)")
    // ...the best configuration beats no-neighbor-checking...
    assert(sweep.map(_._2).max >= byRange(0),
      "some nonzero reassign range must match or beat range 0")
    // ...and the marginal gain wanes (saturation: the paper's 64 -> 128 step).
    val gainEarly = byRange(8) - byRange(0)
    val gainLate = byRange(32) - byRange(16)
    assert(gainLate <= gainEarly + 0.01,
      f"gain must saturate: early=$gainEarly%.4f late=$gainLate%.4f")
  }
}
