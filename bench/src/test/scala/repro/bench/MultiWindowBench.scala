package repro.bench

import repro.SparkSpec

/** Figures 8/12 shape: multi-window parallel optimization vs chained
  * sequential Spark windows.
  */
class MultiWindowBench extends SparkSpec {

  test("parallel multi-window plan beats the sequential chain") {
    val rows = OfflineMultiWindow.run(spark, sizes = Seq(50000L, 200000L, 500000L))
    println(OfflineMultiWindow.render(rows))
    // the parallel plan must win on the larger sizes (small sizes are
    // dominated by fixed job overhead on local mode)
    val large = rows.last
    assert(large.speedup > 1.0, f"speedup ${large.speedup}%.2fx at ${large.rows} rows")
  }
}
