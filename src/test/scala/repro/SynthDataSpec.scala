package repro

import org.scalatest.funsuite.AnyFunSuite

class LocalGenSpec extends AnyFunSuite {
  import LocalGen._

  test("zipf draws are deterministic in the seed") {
    val a = new Zipf(1000, 1.1, 42); val b = new Zipf(1000, 1.1, 42)
    assert((1 to 100).map(_ => a.next()) == (1 to 100).map(_ => b.next()))
  }

  test("zipf ranks are in [1, n]") {
    val z = new Zipf(500, 1.2, 1)
    (1 to 10000).foreach { _ => val r = z.next(); assert(r >= 1 && r <= 500) }
  }

  test("zipf rank 1 is the most frequent") {
    val z = new Zipf(100, 1.5, 2)
    val counts = (1 to 20000).map(_ => z.next()).groupBy(identity).view.mapValues(_.size)
    assert(counts(1) == counts.values.max)
  }

  test("zipf probabilities sum to 1") {
    val z = new Zipf(200, 1.1, 3)
    assert(math.abs((1 to 200).map(z.p).sum - 1.0) < 1e-9)
  }

  test("expectedUnique is monotone in draws and bounded by n") {
    val z = new Zipf(1000, 1.05, 4)
    val e1 = z.expectedUnique(100); val e2 = z.expectedUnique(10000)
    assert(e1 < e2 && e2 <= 1000.0)
  }

  test("expectedUnique approximates the empirical unique count") {
    val z = new Zipf(5000, 1.05, 5)
    val empirical = (1 to 20000).map(_ => z.next()).distinct.size
    val expected = new Zipf(5000, 1.05, 99).expectedUnique(20000)
    assert(math.abs(empirical - expected) / expected < 0.1,
      s"empirical=$empirical expected=$expected")
  }

  test("clicks generator produces the TalkingData column shape") {
    val cs = clicks(1000, nIps = 500, seed = 6)
    assert(cs.size == 1000)
    assert(cs.forall(c => c.ip.startsWith("ip_")))
    assert(cs.forall(c => c.app >= 0 && c.app < 500))
    assert(cs.map(_.ip).distinct.size > 1)
  }

  test("unionStream timestamps strictly increase") {
    val ts = unionStream(1000, nKeys = 10)
    assert(ts.map(_.ts) == (0L until 1000L))
  }
}

class SynthDataSpec extends SparkSpec {

  test("clicks DataFrame has the TalkingData-lite schema") {
    val df = SynthData.clicks(spark, rows = 1000, nIps = 1000)
    assert(df.columns.toSeq ==
      Seq("ip", "app", "device", "os", "channel", "click_time", "is_attributed"))
    assert(df.count() == 1000)
  }

  test("clicks ip keys are heavily repeated (zipf regime)") {
    val df = SynthData.clicks(spark, rows = 20000, nIps = 100000)
    val unique = df.select("ip").distinct().count()
    assert(unique < 15000, s"unique=$unique — expected heavy repetition")
  }

  test("actions/ordersStream share the union-compatible columns") {
    val a = SynthData.actions(spark, 100, 10)
    val o = SynthData.ordersStream(spark, 100, 10)
    assert(a.columns.toSet == o.columns.toSet)
  }

  test("generators are deterministic in the seed") {
    val x = SynthData.actions(spark, 50, 5).collect().map(_.toString).sorted.toSeq
    val y = SynthData.actions(spark, 50, 5).collect().map(_.toString).sorted.toSeq
    assert(x == y)
  }
}
