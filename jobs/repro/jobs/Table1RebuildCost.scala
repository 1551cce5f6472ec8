package repro.jobs

import repro.sim.RebuildCost

/** Table 1: global rebuild cost of disk-based ANNS indices vs SPFresh's
  * incremental maintenance. `spark-submit --class repro.jobs.Table1RebuildCost`
  * (the measurement itself is driver-local; Spark is not needed here).
  *
  * Args: [n] [dim] — default 10000 32.
  */
object Table1RebuildCost {
  def main(args: Array[String]): Unit = {
    val n = args.headOption.map(_.toInt).getOrElse(10000)
    val dim = args.lift(1).map(_.toInt).getOrElse(32)
    val rows = RebuildCost.measure(RebuildCost.CostConfig(dim = dim, n = n))
    println(s"=== Table 1 (reproduction, n=$n dim=$dim) ===")
    println(RebuildCost.render(rows))
    println()
    println("paper (billion-scale): DiskANN 1100GB/32c/2d (or 64GB/16c/5d); SPANN 260GB/45c/4d")
  }
}
