package repro.bench

import repro.SparkSpec
import repro.sim.PipelineModel

/** Fig 12 reproduction: fore/background pipeline balance. Service times of
  * the Updater and Local Rebuilder are measured on the real engine; the
  * feed-forward throughput law then reproduces the paper's saturation
  * shape — adding foreground threads stops helping once the background is
  * the bottleneck, and vice versa.
  */
class Fig12PipelineBench extends SparkSpec {

  test("Fig 12: pipeline throughput saturates at the slower stage") {
    val st = PipelineModel.measure()
    println(f"=== Fig 12: measured service times fg=${st.tFgSec * 1e6}%.1fus bg=${st.tBgSec * 1e6}%.1fus " +
      f"balanced ratio=${PipelineModel.balancedRatio(st)}%.2f:1 (paper: 2:1) ===")
    val fgSweep = Seq(1, 2, 4, 8).map(f => (f, PipelineModel.throughput(st, f, 1)))
    val bgSweep = Seq(1, 2, 4, 8).map(b => (b, PipelineModel.throughput(st, 8, b)))
    fgSweep.foreach { case (f, t) => println(f"fg=$f%2d bg=1  -> $t%12.0f updates/s") }
    bgSweep.foreach { case (b, t) => println(f"fg=8 bg=$b%2d -> $t%12.0f updates/s") }

    // Monotone, then saturating: the last doubling of fg threads with one
    // background thread must help less than the first (or not at all).
    val gain1 = fgSweep(1)._2 / fgSweep(0)._2
    val gain3 = fgSweep(3)._2 / fgSweep(2)._2
    assert(gain3 <= gain1 + 1e-9, f"fg scaling must saturate: x2 gain $gain1%.2f -> $gain3%.2f")
    // With fg fixed at 8, adding background threads helps until balance.
    assert(bgSweep.map(_._2).zip(bgSweep.tail.map(_._2)).forall { case (a, b) => b >= a - 1e-9 },
      "bg scaling must be monotone non-decreasing")
    // The throughput law is tight: min() of the two stage capacities.
    val t81 = PipelineModel.throughput(st, 8, 1)
    assert(math.abs(t81 - math.min(8 / st.tFgSec, 1 / st.tBgSec)) < 1e-6)
    // Sanity: service times are positive and finite.
    assert(st.tFgSec > 0 && st.tBgSec > 0)
  }
}
