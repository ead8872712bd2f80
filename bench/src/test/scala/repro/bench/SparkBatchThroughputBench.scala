package repro.bench

import repro.SparkSpec

/** Extra (not a paper table): the real Spark batch dataflow runtime pushed
  * through a sizable mixed workload, demonstrating the compiled IR
  * executing at scale on the engine rather than in simulation. */
class SparkBatchThroughputBench extends SparkSpec {

  test("Spark batch runtime sustains a mixed hotel workload") {
    val (n, secs, rps) = Experiments.sparkBatchThroughput(spark, nRequests = 2000)
    println(f"== Spark batch runtime: $n requests in $secs%.1f s = $rps%.0f req/s " +
      "(breadth-first hop rounds, local[*])")
    assert(rps > 10, f"unreasonably slow: $rps%.1f req/s")
  }
}
