package repro.jobs

import repro.sim.AblationStudy

/** Fig 11: reassign-range parameter study — accuracy rises with the range
  * and saturates (the paper picks 64 of ~0.1B postings; scaled here to the
  * reproduction's posting count).
  *
  * Args: [baseN] [updateN] — default 6000 2000.
  */
object Fig11ReassignRange {
  def main(args: Array[String]): Unit = {
    val baseN = args.headOption.map(_.toInt).getOrElse(6000)
    val updateN = args.lift(1).map(_.toInt).getOrElse(2000)
    val cfg = AblationStudy.ShiftConfig(baseN = baseN, updateN = updateN)
    val w = AblationStudy.shiftedWorkload(cfg)
    println(s"=== Fig 11: reassign range sweep (baseN=$baseN updateN=$updateN, probes=8) ===")
    AblationStudy.reassignRangeSweep(cfg, w, Seq(0, 2, 4, 8, 16, 32), probes = 8)
      .foreach { case (range, recall) => println(f"range=$range%3d recall=$recall%.3f") }
  }
}
