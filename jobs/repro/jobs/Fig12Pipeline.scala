package repro.jobs

import repro.sim.PipelineModel

/** Fig 12: foreground/background pipeline balance — measured service times
  * of the Updater and the Local Rebuilder feed the feed-forward throughput
  * law; the paper settles on a 2:1 fore/background thread ratio.
  */
object Fig12Pipeline {
  def main(args: Array[String]): Unit = {
    val st = PipelineModel.measure()
    println(f"measured service times: fg=${st.tFgSec * 1e6}%.1fus/insert bg=${st.tBgSec * 1e6}%.1fus/insert")
    println(f"balanced fg:bg thread ratio = ${PipelineModel.balancedRatio(st)}%.2f : 1")
    println()
    println("Foreground scalability (background=1):")
    Seq(1, 2, 4, 8).foreach { f =>
      println(f"  fg=$f%2d bg=1  -> ${PipelineModel.throughput(st, f, 1)}%10.0f updates/s")
    }
    println("Background scalability (foreground=8):")
    Seq(1, 2, 4, 8).foreach { b =>
      println(f"  fg=8 bg=$b%2d -> ${PipelineModel.throughput(st, 8, b)}%10.0f updates/s")
    }
  }
}
