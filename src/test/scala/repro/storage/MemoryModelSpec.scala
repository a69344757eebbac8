package repro.storage

import org.scalatest.funsuite.AnyFunSuite
import repro.storage.MemoryModel._

class MemoryModelSpec extends AnyFunSuite {

  test("paper §8.1 worked example: 1.568 GB") {
    // "latest" table, 1M rows, row length 300 B, two indexes (1M unique
    // 16-byte keys each), 2 replicas, C=70, K=1.
    val t = TableSpec(Latest, nRows = 1000000L, avgRowLen = 300,
      indexes = Seq(IndexSpec(1000000L, 16), IndexSpec(1000000L, 16)),
      nReplica = 2, dataCopies = 1)
    assert(tableBytes(t) == 1568000000L)
  }

  test("C constant: latest/absorlat use 70, absolute/absandlat use 74") {
    assert(Latest.C == 70 && Absorlat.C == 70)
    assert(Absolute.C == 74 && Absandlat.C == 74)
  }

  test("replicas scale the total linearly") {
    def spec(r: Int) = TableSpec(Latest, 1000, 100, Seq(IndexSpec(100, 8)), nReplica = r)
    assert(tableBytes(spec(3)) == 3 * tableBytes(spec(1)))
  }

  test("each extra index adds key overhead and per-row node cost") {
    val one = TableSpec(Absolute, 1000, 100, Seq(IndexSpec(100, 8)))
    val two = TableSpec(Absolute, 1000, 100, Seq(IndexSpec(100, 8), IndexSpec(50, 8)))
    val delta = tableBytes(two) - tableBytes(one)
    assert(delta == 50 * (8 + PerKeyOverhead) + 1000L * Absolute.C)
  }

  test("dataCopies K multiplies only the row payload") {
    val k1 = TableSpec(Latest, 1000, 100, Seq(IndexSpec(10, 8), IndexSpec(10, 8)), dataCopies = 1)
    val k2 = k1.copy(dataCopies = 2)
    assert(tableBytes(k2) - tableBytes(k1) == 1000L * 100)
  }

  test("K outside [1, n_index] is rejected") {
    intercept[IllegalArgumentException](
      TableSpec(Latest, 10, 10, Seq(IndexSpec(1, 1)), dataCopies = 2))
  }

  test("totalBytes sums across tables") {
    val a = TableSpec(Latest, 10, 10, Seq(IndexSpec(1, 1)))
    val b = TableSpec(Absolute, 20, 20, Seq(IndexSpec(2, 2)))
    assert(totalBytes(Seq(a, b)) == tableBytes(a) + tableBytes(b))
  }

  test("guard: writes fail above the limit, accounting unwinds") {
    val g = new MemoryGuard(maxBytes = 1000)
    g.tryWrite(800)
    intercept[g.WriteRejectedException](g.tryWrite(300))
    assert(g.usedBytes == 800) // rejected write did not stick
  }

  test("guard: reads conceptually unaffected — usage stays queryable after rejection") {
    val g = new MemoryGuard(maxBytes = 100)
    intercept[g.WriteRejectedException](g.tryWrite(200))
    assert(g.usedBytes == 0)
  }

  test("guard: alert fires once per excursion above the threshold") {
    var alerts = 0
    val g = new MemoryGuard(maxBytes = 1000, alertFraction = 0.5, onAlert = _ => alerts += 1)
    g.tryWrite(600)
    g.tryWrite(100)
    assert(alerts == 1) // second write above threshold does not re-fire
    g.release(400)      // back under threshold re-arms
    g.tryWrite(400)
    assert(alerts == 2)
  }

  test("guard: release frees accounted bytes") {
    val g = new MemoryGuard(maxBytes = 1000)
    g.tryWrite(900); g.release(500)
    g.tryWrite(500) // fits again
    assert(g.usedBytes == 900)
  }
}
