package repro.core.online

import repro.core._
import repro.core.functions.AggCore
import repro.storage.TimeSeriesStore

/** An online table: the two-layer skiplist store holding decoded rows
  * (column name -> value) keyed by the index column and ordered by ts.
  * This is the tablet-server memtable of §7.2 wearing a test-friendly
  * payload type (production payloads are RowCodec bytes; the codec is
  * exercised by its own suite and the memory benches).
  */
final class OnlineTable(val keyCol: String, val tsCol: String) {
  val store = new TimeSeriesStore[String, Map[String, Any]]

  def put(row: Map[String, Any]): Unit =
    store.put(String.valueOf(row(keyCol)), asLong(row(tsCol)), row)

  def scan(key: String, lo: Long, hi: Long): Iterator[(Long, Map[String, Any])] =
    store.scan(key, lo, hi).map(e => (e.ts, e.payload))

  def latest(key: String, atOrBefore: Long): Option[(Long, Map[String, Any])] =
    store.latest(key, atOrBefore).map(e => (e.ts, e.payload))

  private def asLong(v: Any): Long = v match {
    case l: Long => l
    case i: Int  => i.toLong
    case other   => other.toString.toLong
  }
}

/** Online Request Mode executor (§3.2 (3)): each request tuple is
  * *virtually inserted* into the primary table, the deployed
  * [[FeatureSpec]] runs against the stores, and one feature row comes
  * back. All aggregates fold the exact [[AggCore]] states the offline
  * Spark plan uses.
  *
  * Long-window features can be served from a [[PreAggTable]] hierarchy
  * (per `(window, column)` binding) instead of raw scans — the §5.1
  * optimization; the raw edges still come from the skiplist.
  */
final class RequestEngine(
    spec: FeatureSpec,
    tables: Map[String, OnlineTable],
    preAgg: Map[(String, String), PreAggTable] = Map.empty) {

  private val primary = tables(spec.primary)

  /** Ingest a data tuple into a table (and its pre-aggregators). */
  def insert(table: String, row: Map[String, Any]): Unit = {
    val t = tables(table)
    t.put(row)
    if (table == spec.primary) {
      val ts = num(row(t.tsCol)).toLong
      preAgg.foreach { case ((_, valCol), pa) =>
        row.get(valCol).filter(_ != null)
          .foreach(v => pa.insert(String.valueOf(row(t.keyCol)), ts, num(v)))
      }
    }
  }

  private def num(v: Any): Double = v match {
    case d: Double => d
    case f: Float  => f.toDouble
    case l: Long   => l.toDouble
    case i: Int    => i.toDouble
    case s: Short  => s.toDouble
    case other     => other.toString.toDouble
  }

  /** Rows in a window's frame for the request tuple, oldest first,
    * including the virtual insert itself.
    */
  private def frameRows(w: WindowDef, req: Map[String, Any]): Seq[Map[String, Any]] = {
    val key = String.valueOf(req(w.keyCol))
    val t   = num(req(w.tsCol)).toLong
    val lo  = t - w.rangeMs
    val own   = primary.scan(key, lo, t).map(_._2)
    val union = w.unionTables.iterator.flatMap(n => tables(n).scan(key, lo, t).map(_._2))
    ((own ++ union).toSeq :+ req).sortBy(r => num(r(w.tsCol)).toLong)
  }

  /** Fold one feature over ordered frame rows via the shared library. */
  private def computeFn(fn: FeatureFn, rows: Seq[Map[String, Any]]): Any = fn match {
    case FeatureFn.Count => rows.size.toLong
    case FeatureFn.Sum(c) =>
      val st = new AggCore.SumState
      rows.foreach(r => st.update(boxed(r.get(c)))); st.result
    case FeatureFn.Avg(c) =>
      val st = new AggCore.AvgState
      rows.foreach(r => st.update(boxed(r.get(c)))); st.result
    case FeatureFn.Min(c) =>
      val st = new AggCore.MinState
      rows.foreach(r => st.update(boxed(r.get(c)))); st.result
    case FeatureFn.Max(c) =>
      val st = new AggCore.MaxState
      rows.foreach(r => st.update(boxed(r.get(c)))); st.result
    case FeatureFn.DistinctCount(c) =>
      val st = new AggCore.DistinctCountState
      rows.foreach(r => st.update(str(r.get(c)))); st.result
    case FeatureFn.TopNFreq(c, n) =>
      val st = new AggCore.TopNFreqState(n)
      rows.foreach(r => st.update(str(r.get(c)))); st.result
    case FeatureFn.AvgCateWhere(v, cond, cate) =>
      val st = new AggCore.AvgCateWhereState
      rows.foreach(r => st.update((boxed(r.get(v)), bool(r.get(cond)), str(r.get(cate)))))
      st.result
    case FeatureFn.Drawdown(c) =>
      val st = new AggCore.DrawdownState
      rows.foreach(r => st.update(boxed(r.get(c)))); st.result
    case FeatureFn.EwAvg(c, a) =>
      val st = new AggCore.EwAvgState(a)
      rows.foreach(r => st.update(boxed(r.get(c)))); st.result
  }

  private def boxed(v: Option[Any]): java.lang.Double = v match {
    case Some(null) | None => null
    case Some(x)           => java.lang.Double.valueOf(num(x))
  }
  private def str(v: Option[Any]): String = v match {
    case Some(null) | None => null
    case Some(x)           => String.valueOf(x)
  }
  private def bool(v: Option[Any]): java.lang.Boolean = v match {
    case Some(null) | None  => null
    case Some(b: Boolean)   => java.lang.Boolean.valueOf(b)
    case Some(x)            => java.lang.Boolean.valueOf(x.toString.toBoolean)
  }

  /** Serve one request tuple: virtual insert + feature computation. The
    * tuple is NOT persisted (mirroring OpenMLDB request mode).
    */
  def request(req: Map[String, Any]): Map[String, Any] = {
    val frameCache = scala.collection.mutable.HashMap.empty[String, Seq[Map[String, Any]]]
    var out = req
    spec.features.foreach { f =>
      val w = spec.window(f.window)
      val value = preAggValue(f, w, req).getOrElse {
        val rows = frameCache.getOrElseUpdate(w.name, frameRows(w, req))
        computeFn(f.fn, rows)
      }
      out = out.updated(f.name, value)
    }
    spec.lastJoins.foreach { lj =>
      val key = String.valueOf(req(lj.keyCol))
      val ts  = num(req(primary.tsCol)).toLong
      val hit = tables(lj.table).latest(key, ts).map(_._2)
      lj.valCols.foreach { v =>
        out = out.updated(s"${lj.prefix}$v", hit.map(_.getOrElse(v, null)).orNull)
      }
    }
    out
  }

  /** §5.1 fast path: count/sum/avg/min/max over a pre-aggregated long
    * window merge bucket partials plus the raw edge and the virtual row.
    */
  private def preAggValue(f: Feature, w: WindowDef, req: Map[String, Any]): Option[Any] = {
    if (w.unionTables.nonEmpty) return None
    // Count can ride on any aggregator of this window (bucket `cnt` counts
    // rows with a non-null value column — the deployment contract).
    val binding: Option[(String, PreAggTable)] = f.fn match {
      case FeatureFn.Sum(c) => preAgg.get((w.name, c)).map((c, _))
      case FeatureFn.Avg(c) => preAgg.get((w.name, c)).map((c, _))
      case FeatureFn.Min(c) => preAgg.get((w.name, c)).map((c, _))
      case FeatureFn.Max(c) => preAgg.get((w.name, c)).map((c, _))
      case FeatureFn.Count  =>
        preAgg.collectFirst { case ((wn, c), pa) if wn == w.name => (c, pa) }
      case _ => None
    }
    val (valCol, pa) = binding.getOrElse(return None)
    val key = String.valueOf(req(w.keyCol))
    val t   = num(req(w.tsCol)).toLong
    val merged0 = pa.query(key, t - w.rangeMs, t,
      (lo, hi) => primary.scan(key, lo, hi).map { case (ts, r) => (ts, num(r(valCol))) })
    // The virtual request row participates in its own frame.
    val merged = req.get(valCol).filter(_ != null) match {
      case Some(v) => merged0.add(num(v))
      case None if f.fn == FeatureFn.Count => merged0.add(0.0)
      case None    => merged0
    }
    f.fn match {
      case FeatureFn.Count  => Some(merged.cnt)
      case FeatureFn.Sum(_) => Some(if (merged.cnt == 0) null else merged.sum)
      case FeatureFn.Avg(_) => Some(if (merged.cnt == 0) null else merged.sum / merged.cnt)
      case FeatureFn.Min(_) => Some(if (merged.cnt == 0) null else merged.min)
      case FeatureFn.Max(_) => Some(if (merged.cnt == 0) null else merged.max)
      case _                => None
    }
  }
}
