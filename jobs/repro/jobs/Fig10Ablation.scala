package repro.jobs

import repro.sim.AblationStudy

/** Fig 10: ablation ladder under distribution shift — in-place only →
  * + split → + split/reassign (SPFresh) vs the static ideal, as
  * recall/latency trade-off curves.
  *
  * Args: [baseN] [updateN] — default 6000 2000.
  */
object Fig10Ablation {
  def main(args: Array[String]): Unit = {
    val baseN = args.headOption.map(_.toInt).getOrElse(6000)
    val updateN = args.lift(1).map(_.toInt).getOrElse(2000)
    val cfg = AblationStudy.ShiftConfig(baseN = baseN, updateN = updateN)
    val w = AblationStudy.shiftedWorkload(cfg)
    val probes = Seq(2, 4, 8, 16)
    println(s"=== Fig 10: update-technique ablation (baseN=$baseN updateN=$updateN) ===")
    Seq("in-place", "in-place+split", "spfresh", "static").foreach { v =>
      AblationStudy.tradeoff(cfg, w, v, probes).foreach { p =>
        println(f"${p.system}%-15s probes=${p.probes}%3d recall=${p.recall}%.3f " +
          f"meanMs=${p.meanMs}%6.2f p99Ms=${p.p99Ms}%6.2f")
      }
    }
  }
}
