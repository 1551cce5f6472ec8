package repro.bench

import java.nio.file.Files

import repro.SparkSpec
import repro.sim.StressSimulation

/** Table 3 + Fig 9 reproduction: the (scaled) stress test of the Spark
  * distributed index on uniform and skew datasets. Asserted shape matches
  * §5.3: accuracy stays stable and above a floor on both datasets, the
  * per-query I/O (IOPS proxy) and tail latency stay flat, and memory grows
  * only marginally with new postings.
  */
class Table3StressBench extends SparkSpec {
  private val baseN = sys.env.getOrElse("REPRO_BENCH_STRESS_N", "8000").toInt
  private val epochs = sys.env.getOrElse("REPRO_BENCH_STRESS_EPOCHS", "5").toInt

  private def runOne(name: String, skew: Boolean): Seq[StressSimulation.StressEpoch] = {
    val root = Files.createTempDirectory(s"bench-stress-$name").toString
    val cfg = StressSimulation.StressConfig(baseN = baseN, epochs = epochs)
    val es = StressSimulation.run(spark, root, cfg, skew)
    println(s"=== Table 3 / Fig 9, $name dataset, baseN=$baseN epochs=$epochs ===")
    println(StressSimulation.render(name, es))
    es
  }

  private def assertStable(name: String, es: Seq[StressSimulation.StressEpoch], floor: Double): Unit = {
    assert(es.map(_.recall).min >= floor,
      f"$name recall floor violated: ${es.map(_.recall).min}%.3f < $floor%.2f")
    assert(es.last.recall >= es.head.recall - 0.05,
      f"$name recall must not decay: first=${es.head.recall}%.3f last=${es.last.recall}%.3f")
    assert(es.last.meanIoBlocks <= 1.6 * es.head.meanIoBlocks,
      f"$name per-query I/O must stay flat: ${es.head.meanIoBlocks}%.1f -> ${es.last.meanIoBlocks}%.1f")
    assert(es.last.p999Ms <= math.max(1.0, 1.75 * es.head.p999Ms),
      f"$name P99.9 must stay flat: ${es.head.p999Ms}%.2f -> ${es.last.p999Ms}%.2f")
    assert(es.last.memoryMb <= 1.5 * es.head.memoryMb,
      f"$name memory must grow only marginally: ${es.head.memoryMb}%.2f -> ${es.last.memoryMb}%.2f")
  }

  test("Table 3 / Fig 9: uniform dataset stays stable under sustained updates") {
    val es = runOne("uniform", skew = false)
    // Paper floor at billion scale: 0.862 with 64 probes; our probe share of
    // the posting count is proportionally richer, hence the 0.85 floor.
    assertStable("uniform", es, floor = 0.85)
  }

  test("Table 3 / Fig 9: skew dataset stays stable under sustained updates") {
    val es = runOne("skew", skew = true)
    // Paper floor: 0.807 on the skewed dataset (lower than uniform).
    assertStable("skew", es, floor = 0.80)
    // Skew forces real rebalance work (the reason LIRE exists).
    assert(es.map(_.splits).sum > 0, "skewed updates must trigger splits")
  }
}
