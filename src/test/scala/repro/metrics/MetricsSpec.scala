package repro.metrics

import repro.SparkSpec

/** Latency/resource model sanity: monotonicity and the paper's constants. */
class MetricsSpec extends SparkSpec {

  test("searchMs grows with blocks read") {
    assert(LatencyModel.searchMs(100, 0) > LatencyModel.searchMs(10, 0))
  }

  test("searchMs grows with centroid distance computations") {
    assert(LatencyModel.searchMs(10, 100000) > LatencyModel.searchMs(10, 1000))
  }

  test("parallel I/O amortizes reads within a batch") {
    val one = LatencyModel.searchMs(1, 0)
    val batch = LatencyModel.searchMs(LatencyModel.IoParallelism, 0)
    assert(one == batch, "a full parallel batch costs one serial read")
  }

  test("insertMs charges serial reads and writes") {
    assert(LatencyModel.insertMs(1, 1, 0) == LatencyModel.BlockReadMs + LatencyModel.BlockWriteMs)
  }

  test("percentile of a constant sample is the constant") {
    assert(LatencyModel.percentile(Seq.fill(100)(5.0), 99.0) == 5.0)
  }

  test("P99 of 1..100 is 99") {
    val xs = (1 to 100).map(_.toDouble)
    assert(LatencyModel.percentile(xs, 99.0) == 99.0)
  }

  test("P50 is a median-order statistic") {
    val xs = Seq(1.0, 2.0, 3.0, 4.0)
    assert(LatencyModel.percentile(xs, 50.0) == 2.0)
  }

  test("percentile rejects empty samples") {
    intercept[IllegalArgumentException](LatencyModel.percentile(Seq.empty, 99.0))
  }

  test("version map model is 1 byte per vector") {
    assert(ResourceModel.versionMapBytes(1000L) == 1000L)
  }

  test("block mapping entries charge 40B plus 8B per block beyond three") {
    assert(ResourceModel.blockMappingBytes(Seq(1, 3)) == 80L)
    assert(ResourceModel.blockMappingBytes(Seq(10)) == 40L + 8L * 7)
  }

  test("long postings make SPANN+-style mapping entries bigger") {
    val fresh = ResourceModel.blockMappingBytes(Seq.fill(100)(4))
    val plus = ResourceModel.blockMappingBytes(Seq.fill(10)(40))
    assert(plus / 10 > fresh / 100, "per-posting entry must grow with posting length")
  }

  test("DiskANN model spikes during merge and grows with delta") {
    val base = ResourceModel.diskAnnBytes(10000, 32, 32, 0, merging = false)
    val withDelta = ResourceModel.diskAnnBytes(10000, 32, 32, 1000, merging = false)
    val merging = ResourceModel.diskAnnBytes(10000, 32, 32, 1000, merging = true)
    assert(withDelta > base && merging > withDelta)
  }

  test("centroid bytes scale with count and dim") {
    assert(ResourceModel.centroidBytes(100, 32) == 100L * (128 + 64))
  }

  test("mb converts bytes") {
    assert(ResourceModel.mb(1024L * 1024L) == 1.0)
  }
}
