package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Figure 6 shape: request-engine latency/throughput vs the DuckDB
  * per-request SQL baseline.
  */
class OnlineMicroBench extends AnyFunSuite {

  test("online microbench: request engine beats the embedded-SQL baseline") {
    val rs = OnlineMicro.run()
    println(OnlineMicro.render(rs))
    val Seq(eng, duck) = rs
    assert(eng.p50Ms < duck.p50Ms, s"p50 ${eng.p50Ms} vs ${duck.p50Ms}")
    assert(eng.qps > duck.qps)
    // paper: 87.7% latency reduction vs DuckDB => ~8x; shapes vary on a
    // shared CI box, so require a conservative 2x
    assert(duck.p50Ms / eng.p50Ms > 2.0, f"speedup ${duck.p50Ms / eng.p50Ms}%.1fx")
  }
}
