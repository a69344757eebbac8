package repro.core.online

import org.scalatest.funsuite.AnyFunSuite
import repro.core._

class RequestEngineSpec extends AnyFunSuite {

  private def mkEngine(preAgg: Map[(String, String), PreAggTable] = Map.empty) = {
    val spec = FeatureSpec(
      primary = "actions",
      windows = Seq(
        WindowDef("w3s", "userid", "ts", 3000L, unionTables = Seq("orders")),
        WindowDef("w10s", "userid", "ts", 10000L)),
      features = Seq(
        Feature("cnt", FeatureFn.Count, "w3s"),
        Feature("price_sum", FeatureFn.Sum("price"), "w3s"),
        Feature("price_avg", FeatureFn.Avg("price"), "w10s"),
        Feature("top_cat", FeatureFn.TopNFreq("category", 1), "w3s"),
        Feature("dd", FeatureFn.Drawdown("price"), "w10s")),
      lastJoins = Seq(LastJoinDef("profile", "userid", "pts", Seq("segment"), "p_")))
    val tables = Map(
      "actions" -> new OnlineTable("userid", "ts"),
      "orders"  -> new OnlineTable("userid", "ts"),
      "profile" -> new OnlineTable("userid", "pts"))
    (new RequestEngine(spec, tables, preAgg), tables)
  }

  private def action(u: Long, ts: Long, price: Double, cat: String): Map[String, Any] =
    Map("userid" -> u, "ts" -> ts, "price" -> price, "category" -> cat)

  test("request over an empty store sees only the virtual tuple") {
    val (eng, _) = mkEngine()
    val out = eng.request(action(1, 1000, 9.0, "shoes"))
    assert(out("cnt") == 1L)
    assert(out("price_sum") == 9.0)
    assert(out("top_cat") == "shoes")
  }

  test("window frames include stored rows within range") {
    val (eng, _) = mkEngine()
    eng.insert("actions", action(1, 500, 10.0, "books"))
    eng.insert("actions", action(1, 900, 20.0, "shoes"))
    val out = eng.request(action(1, 1000, 30.0, "shoes"))
    assert(out("cnt") == 3L)
    assert(out("price_sum") == 60.0)
    assert(out("top_cat") == "shoes")
  }

  test("rows outside the window range are excluded") {
    val (eng, _) = mkEngine()
    eng.insert("actions", action(1, 100, 10.0, "books"))   // 3s window at ts=5000 excludes
    eng.insert("actions", action(1, 4000, 20.0, "shoes"))
    val out = eng.request(action(1, 5000, 1.0, "toys"))
    assert(out("cnt") == 2L)
    assert(out("price_sum") == 21.0)
  }

  test("union tables contribute to union windows only") {
    val (eng, _) = mkEngine()
    eng.insert("orders", action(1, 900, 100.0, "tech"))
    val out = eng.request(action(1, 1000, 1.0, "shoes"))
    assert(out("cnt") == 2L)          // w3s unions orders
    assert(out("price_sum") == 101.0)
    assert(out("price_avg") == 1.0)   // w10s does NOT union orders
  }

  test("keys are isolated across users") {
    val (eng, _) = mkEngine()
    eng.insert("actions", action(2, 900, 50.0, "x"))
    val out = eng.request(action(1, 1000, 1.0, "y"))
    assert(out("cnt") == 1L)
  }

  test("request tuples are not persisted (virtual insert)") {
    val (eng, _) = mkEngine()
    val a = eng.request(action(1, 1000, 5.0, "a"))
    val b = eng.request(action(1, 1000, 5.0, "a"))
    assert(a("cnt") == 1L && b("cnt") == 1L)
  }

  test("last join returns the latest at-or-before profile row") {
    val (eng, _) = mkEngine()
    eng.insert("profile", Map("userid" -> 1L, "pts" -> 100L, "segment" -> "bronze"))
    eng.insert("profile", Map("userid" -> 1L, "pts" -> 800L, "segment" -> "gold"))
    eng.insert("profile", Map("userid" -> 1L, "pts" -> 2000L, "segment" -> "vip"))
    val out = eng.request(action(1, 1000, 1.0, "c"))
    assert(out("p_segment") == "gold")
  }

  test("last join with no match yields null") {
    val (eng, _) = mkEngine()
    val out = eng.request(action(7, 1000, 1.0, "c"))
    assert(out("p_segment") == null)
  }

  test("drawdown sees rows oldest-to-newest") {
    val (eng, _) = mkEngine()
    eng.insert("actions", action(1, 100, 100.0, "a"))
    eng.insert("actions", action(1, 200, 60.0, "a"))
    val out = eng.request(action(1, 300, 120.0, "a"))
    assert(math.abs(out("dd").asInstanceOf[Double] - 0.4) < 1e-12)
  }

  test("pre-agg path equals the raw-scan path") {
    val pa = new PreAggTable(Seq(100L, 1000L))
    val (engPre, _) = mkEngine(Map(("w10s", "price") -> pa))
    val (engRaw, _) = mkEngine()
    val rnd = new scala.util.Random(8)
    (1 to 500).foreach { i =>
      val a = action(1, i * 17L, rnd.nextInt(100).toDouble, "c")
      engPre.insert("actions", a); engRaw.insert("actions", a)
    }
    val req = action(1, 9000, 5.0, "c")
    val (p, r) = (engPre.request(req), engRaw.request(req))
    assert(math.abs(p("price_avg").asInstanceOf[Double] - r("price_avg").asInstanceOf[Double]) < 1e-9)
  }

  test("pre-agg actually uses buckets for long windows") {
    val pa = new PreAggTable(Seq(100L, 1000L))
    val (eng, _) = mkEngine(Map(("w10s", "price") -> pa))
    (0 until 1000).foreach(i => eng.insert("actions", action(1, i * 10L, 1.0, "c")))
    eng.request(action(1, 9999, 1.0, "c"))
    assert(pa.lastQueryBuckets > 0)
    assert(pa.lastQueryRawRows < 1000, "bulk of the window must come from buckets")
  }

  test("null feature values propagate as nulls, not exceptions") {
    val (eng, _) = mkEngine()
    val out = eng.request(Map("userid" -> 1L, "ts" -> 1000L, "price" -> null, "category" -> null))
    assert(out("price_sum") == null)
    assert(out("cnt") == 1L)
  }
}
