package repro.jobs

import java.nio.file.Files

import org.apache.spark.sql.SparkSession

import repro.sim.StressSimulation

/** Table 3 + Fig 9: the (scaled) billion-scale stress test on the Spark
  * distributed index, uniform and skew datasets.
  *
  * Args: [baseN] [epochs] [dim] — default 12000 8 16.
  */
object Table3Stress {
  def main(args: Array[String]): Unit = {
    val baseN = args.headOption.map(_.toInt).getOrElse(12000)
    val epochs = args.lift(1).map(_.toInt).getOrElse(8)
    val dim = args.lift(2).map(_.toInt).getOrElse(16)
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("Table3Stress")
      .config("spark.sql.shuffle.partitions", "64")
      .getOrCreate()

    println("=== Table 3: thread allocation (paper's §5.3 setup) ===")
    println("Delete/Re-insert 4 | Search 8 | Background 3 | Total 15")
    println()
    val cfg = StressSimulation.StressConfig(dim = dim, baseN = baseN, epochs = epochs)
    Seq(("uniform", false), ("skew", true)).foreach { case (name, skew) =>
      val root = Files.createTempDirectory(s"stress-$name").toString
      val es = StressSimulation.run(spark, root, cfg, skew)
      println(StressSimulation.render(name, es))
      println()
    }
    println("paper: accuracy stable at >=0.862 (uniform) / >=0.807 (skew), IOPS saturated, memory flat")
    spark.stop()
  }
}
