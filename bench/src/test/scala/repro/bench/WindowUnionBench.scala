package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** §9.3.2 shape: self-adjusting union throughput vs the static engine. */
class WindowUnionBench extends AnyFunSuite {

  test("self-adjusting union sustains throughput as windows grow") {
    val rows = WindowUnionAblation.run()
    println(WindowUnionAblation.render(rows))

    // static throughput collapses with window size; self-adjusting holds
    val static10k = rows.last.staticTps
    val static100 = rows.head.staticTps
    assert(static10k < static100, "static engine should degrade with window size")
    assert(rows.last.ratio > 2.0, f"expected >2x at 10k window, got ${rows.last.ratio}%.1fx")
    // self-adjusting stays within an order of magnitude across windows
    val sa = rows.map(_.selfAdjTps)
    assert(sa.max / sa.min < 20.0, s"self-adjusting throughput should stay ~flat: $sa")
  }
}
