package repro.bench

import repro.SparkSpec

/** Figure 13 shape: time-aware skew resolving vs the naive window plan. */
class SkewBench extends SparkSpec {

  test("skew optimization beats the naive hot-key plan") {
    val rows = SkewAblation.run(spark)
    println(SkewAblation.render(rows))
    val naive = rows.head.seconds
    val best = rows.drop(1).map(_.seconds).min
    assert(best < naive, f"skew-optimized $best%.2fs vs naive $naive%.2fs")
  }
}
