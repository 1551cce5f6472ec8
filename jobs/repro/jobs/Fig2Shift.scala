package repro.jobs

import repro.sim.AblationStudy

/** Fig 2: static index vs naive in-place update under distribution shift —
  * recall drops by a point-plus and tail latency blows up.
  *
  * Args: [baseN] [updateN] — default 6000 2000.
  */
object Fig2Shift {
  def main(args: Array[String]): Unit = {
    val baseN = args.headOption.map(_.toInt).getOrElse(6000)
    val updateN = args.lift(1).map(_.toInt).getOrElse(2000)
    val cfg = AblationStudy.ShiftConfig(baseN = baseN, updateN = updateN)
    val w = AblationStudy.shiftedWorkload(cfg)
    val probes = Seq(4, 8, 16)
    println(s"=== Fig 2: static vs naive in-place (baseN=$baseN updateN=$updateN) ===")
    Seq("static", "in-place").foreach { v =>
      AblationStudy.tradeoff(cfg, w, v, probes).foreach { p =>
        println(f"${p.system}%-9s probes=${p.probes}%3d recall=${p.recall}%.3f " +
          f"meanMs=${p.meanMs}%6.2f p99Ms=${p.p99Ms}%6.2f")
      }
    }
  }
}
