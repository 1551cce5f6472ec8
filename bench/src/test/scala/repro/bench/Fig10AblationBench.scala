package repro.bench

import repro.SparkSpec
import repro.sim.AblationStudy

/** Fig 10 reproduction: the ablation ladder under distribution shift.
  * Paper shape: adding *split* to in-place updates cuts latency at equal
  * accuracy; adding *reassign* cuts it further; full SPFresh lands closest
  * to the static ideal.
  */
class Fig10AblationBench extends SparkSpec {
  private val baseN = sys.env.getOrElse("REPRO_BENCH_SHIFT_N", "6000").toInt

  test("Fig 10: split and reassign each move the trade-off toward static") {
    val cfg = AblationStudy.ShiftConfig(baseN = baseN, updateN = baseN / 3)
    val w = AblationStudy.shiftedWorkload(cfg)
    val probes = Seq(2, 4, 8, 16)
    val variants = Seq("in-place", "in-place+split", "spfresh", "static")
    val results = variants.map(v => v -> AblationStudy.tradeoff(cfg, w, v, probes)).toMap

    println(s"=== Fig 10, baseN=$baseN updateN=${baseN / 3} ===")
    variants.foreach { v =>
      results(v).foreach { p =>
        println(f"${p.system}%-15s probes=${p.probes}%3d recall=${p.recall}%.3f " +
          f"meanMs=${p.meanMs}%6.2f p99Ms=${p.p99Ms}%6.2f")
      }
    }

    val at8 = variants.map(v => v -> results(v).find(_.probes == 8).get).toMap
    // Latency ladder at a fixed probe budget (paper's northwest movement).
    assert(at8("in-place+split").meanMs < at8("in-place").meanMs,
      f"split must cut latency: ${at8("in-place+split").meanMs}%.2f vs ${at8("in-place").meanMs}%.2f")
    assert(at8("spfresh").meanMs <= at8("in-place+split").meanMs * 1.05,
      f"reassign must not cost latency: ${at8("spfresh").meanMs}%.2f vs ${at8("in-place+split").meanMs}%.2f")
    assert(at8("spfresh").meanMs < at8("in-place").meanMs,
      "full LIRE must beat naive in-place latency")
    // Reassignment buys accuracy over split-only (NPA repair).
    assert(at8("spfresh").recall >= at8("in-place+split").recall - 0.01,
      f"reassign must not lose recall: ${at8("spfresh").recall}%.3f vs ${at8("in-place+split").recall}%.3f")
    // SPFresh is the closest updatable variant to the static ideal.
    val distTo = (v: String) =>
      math.abs(at8(v).meanMs - at8("static").meanMs) / math.max(0.01, at8("static").meanMs) +
        math.abs(at8("static").recall - at8(v).recall)
    assert(distTo("spfresh") <= distTo("in-place"),
      f"spfresh (${distTo("spfresh")}%.3f) must sit closer to static than in-place (${distTo("in-place")}%.3f)")
  }
}
