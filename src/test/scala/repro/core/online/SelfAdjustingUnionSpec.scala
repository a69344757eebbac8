package repro.core.online

import org.scalatest.funsuite.AnyFunSuite
import repro.LocalGen
import repro.core.online.WindowUnionStream._

class SelfAdjustingUnionSpec extends AnyFunSuite {

  private def closeEnough(a: Array[Double], b: Array[Double]): Unit = {
    assert(a.length == b.length)
    a.indices.foreach { i =>
      assert(math.abs(a(i) - b(i)) < 1e-6, s"idx $i: ${a(i)} vs ${b(i)}")
    }
  }

  test("reference: window sum includes only the key's tuples in range") {
    val ts = IndexedSeq(
      StreamTuple(0, "a", 0, 1.0), StreamTuple(1, "a", 5, 2.0),
      StreamTuple(0, "b", 6, 10.0), StreamTuple(2, "a", 20, 4.0))
    val r = sequentialReference(ts, windowMs = 10)
    assert(r.toSeq == Seq(1.0, 3.0, 10.0, 4.0)) // last window [10,20] excludes ts 0 and 5
  }

  test("static union matches the sequential reference") {
    val tuples = LocalGen.unionStream(20000, nKeys = 50, seed = 21)
    val got = new StaticUnion(4, windowMs = 500).run(tuples)
    closeEnough(got, sequentialReference(tuples, 500))
  }

  test("self-adjusting union matches the reference without rebalances") {
    val tuples = LocalGen.unionStream(20000, nKeys = 50, seed = 22)
    val eng = new SelfAdjustingUnion(4, windowMs = 500, rebalanceEvery = Int.MaxValue)
    closeEnough(eng.run(tuples), sequentialReference(tuples, 500))
  }

  test("self-adjusting union stays exact across rebalances") {
    val tuples = LocalGen.unionStream(50000, nKeys = 20, alpha = 1.5, seed = 23)
    val eng = new SelfAdjustingUnion(4, windowMs = 2000, rebalanceEvery = 5000)
    val got = eng.run(tuples)
    closeEnough(got, sequentialReference(tuples, 2000))
  }

  test("rebalancer actually fires under a skewed key distribution") {
    val tuples = LocalGen.unionStream(60000, nKeys = 16, alpha = 2.0, seed = 24)
    val eng = new SelfAdjustingUnion(4, windowMs = 1000, rebalanceEvery = 2000)
    eng.run(tuples)
    assert(eng.rebalances > 0, "expected at least one rebalance on zipf(2.0) keys")
  }

  test("multi-table provenance: union aggregates across all tables") {
    // same key from 3 different tables — all must land in one window
    val ts = IndexedSeq(
      StreamTuple(0, "k", 0, 1.0), StreamTuple(1, "k", 1, 2.0), StreamTuple(2, "k", 2, 4.0))
    val got = new SelfAdjustingUnion(2, windowMs = 10, rebalanceEvery = Int.MaxValue).run(ts)
    assert(got.toSeq == Seq(1.0, 3.0, 7.0))
  }

  test("window boundary: tuples exactly windowMs apart are included") {
    val ts = IndexedSeq(StreamTuple(0, "k", 0, 1.0), StreamTuple(0, "k", 10, 2.0))
    val got = new StaticUnion(1, windowMs = 10).run(ts)
    assert(got.toSeq == Seq(1.0, 3.0))
  }

  test("tuples older than the window are evicted from the running sum") {
    val ts = IndexedSeq(
      StreamTuple(0, "k", 0, 1.0), StreamTuple(0, "k", 100, 2.0), StreamTuple(0, "k", 150, 4.0))
    val got = new SelfAdjustingUnion(1, windowMs = 60, rebalanceEvery = Int.MaxValue).run(ts)
    assert(got.toSeq == Seq(1.0, 2.0, 6.0))
  }

  test("single worker degenerate case works") {
    val tuples = LocalGen.unionStream(5000, nKeys = 10, seed = 25)
    closeEnough(new SelfAdjustingUnion(1, 300, 1000).run(tuples),
      sequentialReference(tuples, 300))
  }

  test("many workers with few keys still terminate and agree") {
    val tuples = LocalGen.unionStream(5000, nKeys = 3, seed = 26)
    closeEnough(new StaticUnion(8, 300).run(tuples), sequentialReference(tuples, 300))
  }
}
