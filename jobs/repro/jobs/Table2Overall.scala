package repro.jobs

import repro.sim.{SimConfig, UpdateSimulation}

/** Table 2 + Fig 7: the real-world update simulation (§5.2) over SPFresh,
  * SPANN+, and DiskANN-lite, on the shifted (SPACEV-like, Workload A) and
  * stationary (SIFT-like, Workload B) regimes.
  *
  * Args: [baseN] [epochs] [dim] — default 10000 50 32.
  */
object Table2Overall {
  def main(args: Array[String]): Unit = {
    val baseN = args.headOption.map(_.toInt).getOrElse(10000)
    val epochs = args.lift(1).map(_.toInt).getOrElse(50)
    val dim = args.lift(2).map(_.toInt).getOrElse(32)

    println("=== Table 2: thread allocation (paper's §5.2 setup) ===")
    println("            DiskANN  SPANN+  SPFresh")
    println("Insert          3       1       1")
    println("Delete          1       1       1")
    println("Search          2       2       2")
    println("Background     10       2       2")
    println("Total          16       6       6")
    println()

    Seq(("Workload A (SPACEV-like, shifted)", true),
        ("Workload B (SIFT-like, stationary)", false)).foreach { case (name, shifted) =>
      println(s"=== $name: baseN=$baseN epochs=$epochs dim=$dim ===")
      val cfg = SimConfig(dim = dim, baseN = baseN, epochs = epochs, shifted = shifted)
      val w = UpdateSimulation.workload(cfg)
      val spfresh = UpdateSimulation.runClusterEngine(w, rebalance = true)
      val spannPlus = UpdateSimulation.runClusterEngine(w, rebalance = false)
      val diskann = UpdateSimulation.runDiskAnn(w)
      println(UpdateSimulation.render("SPFresh", spfresh))
      println(UpdateSimulation.render("SPANN+", spannPlus))
      println(UpdateSimulation.render("DiskANN", diskann))
      def agg(ms: Seq[repro.sim.EpochMetrics], name: String): Unit = {
        val p999 = UpdateSimulation.mean(ms, _.searchP999Ms)
        val rec = ms.last.recall
        val mem = ms.map(_.memoryMb).max
        println(f"$name%-8s avgP99.9=${p999}%6.2fms finalRecall=$rec%.3f peakMemMB=$mem%8.2f")
      }
      agg(spfresh, "SPFresh"); agg(spannPlus, "SPANN+"); agg(diskann, "DiskANN")
      println()
    }
  }
}
