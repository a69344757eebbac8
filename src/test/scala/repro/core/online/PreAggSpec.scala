package repro.core.online

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class PreAggSpec extends AnyFunSuite {

  /** Raw rows held next to the aggregator so queries can merge edges. */
  private def mkData(n: Int, seed: Long, span: Long): Seq[(Long, Double)] = {
    val rnd = new Random(seed)
    (0 until n).map(_ => (rnd.nextLong(span), rnd.nextDouble() * 100))
  }
  private def rawScan(data: Seq[(Long, Double)])(lo: Long, hi: Long): Iterator[(Long, Double)] =
    data.iterator.filter { case (ts, _) => ts >= lo && ts <= hi }

  private def reference(data: Seq[(Long, Double)], lo: Long, hi: Long): Partial =
    rawScan(data)(lo, hi).foldLeft(Partial.empty) { case (p, (_, v)) => p.add(v) }

  private def assertSame(a: Partial, b: Partial): Unit = {
    assert(a.cnt == b.cnt)
    assert(math.abs(a.sum - b.sum) < 1e-6)
    if (a.cnt > 0) { assert(a.min == b.min); assert(a.max == b.max) }
  }

  test("levels must ascend and divide") {
    intercept[IllegalArgumentException](new PreAggTable(Seq(100L, 50L)))
    intercept[IllegalArgumentException](new PreAggTable(Seq(100L, 250L)))
    new PreAggTable(Seq(100L, 1000L, 10000L)) // fine
  }

  test("bucket-aligned query is answered purely from buckets") {
    val pa = new PreAggTable(Seq(10L, 100L))
    val data = (0L until 1000L).map(t => (t, 1.0))
    data.foreach { case (t, v) => pa.insert("k", t, v) }
    val p = pa.query("k", 0, 999, rawScan(data))
    assert(p.cnt == 1000 && p.sum == 1000.0)
    assert(pa.lastQueryRawRows == 0, "aligned query must not touch raw rows")
    assert(pa.lastQueryBuckets > 0)
  }

  test("ragged edges fall through to finer levels then raw rows") {
    val pa = new PreAggTable(Seq(10L, 100L))
    val data = (0L until 1000L).map(t => (t, 2.0))
    data.foreach { case (t, v) => pa.insert("k", t, v) }
    val p = pa.query("k", 5, 994, rawScan(data)) // unaligned at both ends
    assertSame(p, reference(data, 5, 994))
    assert(pa.lastQueryRawRows > 0, "sub-bucket edges need raw rows")
  }

  test("coarse buckets are preferred over fine ones for the interior") {
    val pa = new PreAggTable(Seq(10L, 100L))
    (0L until 1000L).foreach(t => pa.insert("k", t, 1.0))
    pa.query("k", 0, 999, (_, _) => Iterator.empty)
    // 10 coarse buckets beat 100 fine ones
    assert(pa.lastQueryBuckets == 10)
  }

  test("random ranges match the reference on random data") {
    val pa = new PreAggTable(Seq(100L, 1000L))
    val data = mkData(5000, seed = 1, span = 100000)
    data.foreach { case (t, v) => pa.insert("k", t, v) }
    val rnd = new Random(2)
    (1 to 50).foreach { _ =>
      val a = rnd.nextLong(100000); val b = rnd.nextLong(100000)
      val (lo, hi) = (math.min(a, b), math.max(a, b))
      assertSame(pa.query("k", lo, hi, rawScan(data)), reference(data, lo, hi))
    }
  }

  test("three-level hierarchy matches the reference") {
    val pa = new PreAggTable(Seq(10L, 100L, 1000L))
    val data = mkData(3000, seed = 3, span = 50000)
    data.foreach { case (t, v) => pa.insert("k", t, v) }
    val rnd = new Random(4)
    (1 to 30).foreach { _ =>
      val lo = rnd.nextLong(50000)
      val hi = math.min(49999, lo + rnd.nextLong(20000))
      assertSame(pa.query("k", lo, hi, rawScan(data)), reference(data, lo, hi))
    }
  }

  test("keys are isolated") {
    val pa = new PreAggTable(Seq(10L))
    pa.insert("a", 5, 1.0); pa.insert("b", 5, 100.0)
    val p = pa.query("a", 0, 9, (_, _) => Iterator.empty)
    assert(p.sum == 1.0)
  }

  test("unknown key falls back to the raw scan") {
    val pa = new PreAggTable(Seq(10L))
    val data = Seq((5L, 3.0))
    val p = pa.query("missing", 0, 9, rawScan(data))
    assert(p.cnt == 1 && p.sum == 3.0)
  }

  test("empty range yields the empty partial") {
    val pa = new PreAggTable(Seq(10L))
    pa.insert("k", 5, 1.0)
    assert(pa.query("k", 9, 2, (_, _) => Iterator.empty).cnt == 0)
  }

  test("negative timestamps bucket correctly (floorDiv alignment)") {
    val pa = new PreAggTable(Seq(10L))
    val data = Seq((-15L, 1.0), (-5L, 2.0), (5L, 4.0))
    data.foreach { case (t, v) => pa.insert("k", t, v) }
    assertSame(pa.query("k", -20, 9, rawScan(data)), reference(data, -20, 9))
  }

  test("partial merge combines count/sum/min/max") {
    val a = Partial.empty.add(1.0).add(5.0)
    val b = Partial.empty.add(-3.0)
    val m = a.merge(b)
    assert(m.cnt == 3 && m.sum == 3.0 && m.min == -3.0 && m.max == 5.0)
  }

  test("bucketCount grows with inserted span, not row count") {
    val pa = new PreAggTable(Seq(100L))
    (0L until 1000L).foreach(t => pa.insert("k", t % 200, 1.0)) // 2 buckets only
    assert(pa.bucketCount == 2)
  }

  test("concurrent inserts across keys are safe") {
    val pa = new PreAggTable(Seq(10L, 100L))
    val threads = (0 until 4).map { t =>
      new Thread(() => (0 until 2500).foreach(i => pa.insert(s"k${i % 8}", i.toLong, 1.0)))
    }
    threads.foreach(_.start()); threads.foreach(_.join())
    val total = (0 until 8).map(k => pa.query(s"k$k", 0, 2500, (_, _) => Iterator.empty).cnt).sum
    assert(total == 10000)
  }
}
