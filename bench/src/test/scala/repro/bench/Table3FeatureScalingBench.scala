package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Regenerates paper Table 3 (latency percentiles vs feature count). */
class Table3FeatureScalingBench extends AnyFunSuite {

  test("Table 3: latency scales modestly with feature count") {
    val rows = Table3FeatureScaling.run()
    println(Table3FeatureScaling.render(rows))

    // feature-count derivation matches the paper's column/feature ratios
    assert(rows.map(r => (r.nCols, r.nFeatures)) == Seq((10, 20), (100, 210), (1000, 2100)))
    // latency is monotone in feature count at the median
    assert(rows.map(_.tp50) == rows.map(_.tp50).sorted)
    // percentile ordering is internally consistent
    rows.foreach { r =>
      assert(r.tp50 <= r.tp90 + 1e-9 && r.tp90 <= r.tp99 + 1e-9 && r.tp99 <= r.tp999 + 1e-9)
    }
    // the paper's headline: even 2100 features stay within tens of ms
    assert(rows.last.tp99 < 100.0, s"TP99 at 2100 features: ${rows.last.tp99} ms")
  }
}
