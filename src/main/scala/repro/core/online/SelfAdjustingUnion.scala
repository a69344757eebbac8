package repro.core.online

import java.util.concurrent.{ConcurrentHashMap, CountDownLatch, LinkedBlockingQueue}
import java.util.concurrent.atomic.AtomicLongArray
import scala.collection.mutable.ArrayBuffer

/** Multi-table window-union streaming executors (§5.2 and §9.3.2).
  *
  * The workload: an interleaved stream of tuples from several tables,
  * sharing a key space; every tuple must be answered with the running
  * window aggregate (here: sum over the last `windowMs`) across ALL
  * tables for its key — the online WINDOW UNION.
  *
  * [[StaticUnion]] is the Flink-shaped baseline the paper describes:
  * static key-hash routing to worker threads and no retained incremental
  * state — each tuple re-scans its key's buffered window (the paper's
  * "has to re-sort the data to identify the oldest entries", O(w) per
  * tuple) and suffers hot-key imbalance under zipf keys.
  *
  * [[SelfAdjustingUnion]] is the paper's engine: (1) on-the-fly load
  * balancing — a router map periodically reassigns the hottest keys from
  * the most loaded worker to the least loaded; (2) incremental
  * subtract-and-evict — per-key deque with running sum, O(1) amortized
  * per tuple.
  */
object WindowUnionStream {

  /** One stream tuple; `table` only matters for provenance (the union
    * aggregates across tables by construction).
    */
  final case class StreamTuple(table: Int, key: String, ts: Long, value: Double)

  /** Golden single-threaded reference (used by correctness tests). */
  def sequentialReference(tuples: Seq[StreamTuple], windowMs: Long): Array[Double] = {
    val buf = scala.collection.mutable.HashMap.empty[String, ArrayBuffer[(Long, Double)]]
    tuples.zipWithIndex.map { case (t, _) =>
      val b = buf.getOrElseUpdate(t.key, ArrayBuffer.empty)
      b += ((t.ts, t.value))
      b.filter { case (ts, _) => ts >= t.ts - windowMs && ts <= t.ts }.map(_._2).sum
    }.toArray
  }

  /** Per-key incremental sliding-window state: ascending-ts buffer with a
    * running sum; out-of-order arrivals (possible briefly during key
    * handoff) insert at the right position.
    */
  final class KeyState {
    // buf holds ascending-ts entries; indices < `frameFrom` have been
    // *logically* evicted from the running sum; physical removal only
    // happens once entries fall 2 windows behind the watermark, so a
    // late-arriving tuple (key handoff during rebalance) can still be
    // answered exactly by rescanning the retained tail.
    private val buf = ArrayBuffer.empty[(Long, Double)]
    private var sumWindow = 0.0
    private var frameFrom = 0
    private var lastTs = Long.MinValue

    private def insertSorted(ts: Long, v: Double): Unit = {
      var i = buf.length
      while (i > frameFrom && buf(i - 1)._1 > ts) i -= 1
      buf.insert(i, (ts, v))
    }

    def addAndQuery(ts: Long, v: Double, windowMs: Long): Double = synchronized {
      if (ts >= lastTs) {
        // fast path: in-order arrival — subtract-and-evict, O(1) amortized
        lastTs = ts
        buf += ((ts, v))
        sumWindow += v
        val cutoff = ts - windowMs
        while (frameFrom < buf.length && buf(frameFrom)._1 < cutoff) {
          sumWindow -= buf(frameFrom)._2; frameFrom += 1
        }
        // NOTE: eviction here is *logical* (subtract from the running sum);
        // entries stay in the buffer for the lifetime of the run so a tuple
        // delayed arbitrarily long by a key handoff can still be answered
        // exactly. A production engine would physically compact below a
        // global in-flight watermark.
        sumWindow
      } else {
        // rare path: out-of-order arrival during key handoff — insert and
        // answer exactly from the retained buffer
        insertSorted(ts, v)
        if (ts >= lastTs - windowMs) sumWindow += v // joins the current frame
        else frameFrom += 1 // landed inside the evicted prefix; keep it there
        var s = 0.0
        var i = 0
        while (i < buf.length) {
          val (bts, bv) = buf(i)
          if (bts >= ts - windowMs && bts <= ts) s += bv
          i += 1
        }
        s
      }
    }

    /** O(w) rescan used by the static baseline (no retained sum). */
    def rescan(ts: Long, v: Double, windowMs: Long): Double = synchronized {
      if (ts >= lastTs) { lastTs = ts; buf += ((ts, v)) } else insertSorted(ts, v)
      // the baseline trims expired data but pays a full scan per tuple
      var drop = 0
      while (drop < buf.length && buf(drop)._1 < ts - 2 * windowMs) drop += 1
      if (drop > 1024) { buf.remove(0, drop); frameFrom = math.max(0, frameFrom - drop) }
      var s = 0.0
      var i = 0
      while (i < buf.length) {
        val (bts, bv) = buf(i)
        if (bts >= ts - windowMs && bts <= ts) s += bv
        i += 1
      }
      s
    }
  }

  sealed abstract class ThreadedEngine(nWorkers: Int) {
    protected val states = new ConcurrentHashMap[String, KeyState]()
    protected val processed = new AtomicLongArray(nWorkers)
    private val seqDone = new ConcurrentHashMap[String, java.util.concurrent.atomic.AtomicInteger]()

    /** worker id for a tuple at submission time */
    protected def route(key: String): Int

    protected def handle(t: StreamTuple): Double

    /** Run the whole stream; returns per-tuple results in input order.
      *
      * Per-key ordering across key handoffs: every tuple carries its
      * per-key sequence number. If a worker dequeues tuple n of a key
      * before tuple n-1 has been processed (the predecessor is still in
      * the old worker's backlog after a rebalance), it parks the tuple in
      * a pending map instead of computing a wrong early answer; whichever
      * worker processes the predecessor then chain-processes the parked
      * successor. Ordering stays exact with zero spinning — the §5.2
      * contract without the throughput cliff of busy requeueing.
      */
    def run(tuples: IndexedSeq[StreamTuple]): Array[Double] = {
      val results = new Array[Double](tuples.length)
      // per-tuple per-key sequence numbers (submission order = ts order)
      val seqOf: Array[Int] = {
        val out = new Array[Int](tuples.length)
        val counters = scala.collection.mutable.HashMap.empty[String, Int]
        tuples.indices.foreach { i =>
          val k = tuples(i).key
          val n = counters.getOrElse(k, 0)
          out(i) = n
          counters(k) = n + 1
        }
        out
      }
      // (key, seq) -> parked tuple index awaiting its predecessor
      val pending = new ConcurrentHashMap[(String, Int), Integer]()
      val queues = Array.fill(nWorkers)(new LinkedBlockingQueue[Integer]())
      val done = new CountDownLatch(nWorkers)

      def process(w: Int, idx0: Int): Unit = {
        var idx = idx0
        while (idx >= 0) {
          val t = tuples(idx)
          results(idx) = handle(t)
          processed.incrementAndGet(w)
          onProcessed(w)
          val gate = seqDone.get(t.key)
          val nextSeq = gate.incrementAndGet()
          // chain-process a parked successor, if any arrived early
          val parked = pending.remove((t.key, nextSeq))
          idx = if (parked != null) parked.intValue() else -1
        }
      }

      val workers = (0 until nWorkers).map { w =>
        val th = new Thread(() => {
          var stop = false
          while (!stop) {
            val idx = queues(w).take()
            if (idx < 0) stop = true
            else {
              val t = tuples(idx)
              val gate = seqDone.computeIfAbsent(t.key,
                _ => new java.util.concurrent.atomic.AtomicInteger(0))
              if (gate.get() == seqOf(idx)) process(w, idx)
              else {
                // park; re-check the gate to close the race where the
                // predecessor finished between our check and the put
                pending.put((t.key, seqOf(idx)), idx)
                if (gate.get() == seqOf(idx)) {
                  val again = pending.remove((t.key, seqOf(idx)))
                  if (again != null) process(w, again.intValue())
                }
              }
            }
          }
          done.countDown()
        }, s"union-worker-$w")
        th.setDaemon(true); th.start(); th
      }
      tuples.indices.foreach(i => queues(route(tuples(i).key)).put(i))
      queues.foreach(_.put(-1))
      done.await()
      workers.foreach(_.join())
      // a parked tail tuple whose predecessor chain completed after the
      // final poison is impossible: chains fire synchronously inside
      // process(), so by worker exit every tuple has been handled
      require(pending.isEmpty, s"unprocessed parked tuples: ${pending.size()}")
      results
    }

    protected def onProcessed(worker: Int): Unit = ()
    protected def state(key: String): KeyState =
      states.computeIfAbsent(key, _ => new KeyState)
  }

  /** Flink-style baseline: static hash routing + O(w) rescan per tuple. */
  final class StaticUnion(nWorkers: Int, windowMs: Long) extends ThreadedEngine(nWorkers) {
    protected def route(key: String): Int = math.floorMod(key.hashCode, nWorkers)
    protected def handle(t: StreamTuple): Double = state(t.key).rescan(t.ts, t.value, windowMs)
    def runAll(ts: IndexedSeq[StreamTuple]): Array[Double] = run(ts)
  }

  /** The paper's engine: dynamic key->worker routing + subtract-and-evict. */
  final class SelfAdjustingUnion(nWorkers: Int, windowMs: Long,
                                 rebalanceEvery: Int = 20000) extends ThreadedEngine(nWorkers) {
    private val routing = new ConcurrentHashMap[String, Integer]()
    private val keyLoad = new ConcurrentHashMap[String, java.util.concurrent.atomic.AtomicLong]()
    private val sinceRebalance = new java.util.concurrent.atomic.AtomicLong(0)
    @volatile var rebalances: Int = 0

    protected def route(key: String): Int = {
      keyLoad.computeIfAbsent(key, _ => new java.util.concurrent.atomic.AtomicLong(0)).incrementAndGet()
      val r = routing.get(key)
      if (r != null) r.intValue() else math.floorMod(key.hashCode, nWorkers)
    }

    protected def handle(t: StreamTuple): Double = state(t.key).addAndQuery(t.ts, t.value, windowMs)

    override protected def onProcessed(worker: Int): Unit = {
      if (sinceRebalance.incrementAndGet() % rebalanceEvery == 0) rebalance()
    }

    /** Move the hottest keys off the most loaded worker onto the least
      * loaded one (runtime-metric-driven, as in §5.2 step 1).
      */
    private def rebalance(): Unit = synchronized {
      val loadPerWorker = Array.fill(nWorkers)(0L)
      val it = keyLoad.entrySet().iterator()
      val keyToWorker = scala.collection.mutable.HashMap.empty[String, Int]
      while (it.hasNext) {
        val e = it.next()
        val w = { val r = routing.get(e.getKey); if (r != null) r.intValue() else math.floorMod(e.getKey.hashCode, nWorkers) }
        keyToWorker(e.getKey) = w
        loadPerWorker(w) += e.getValue.get()
      }
      val hot  = loadPerWorker.indices.maxBy(loadPerWorker)
      val cold = loadPerWorker.indices.minBy(loadPerWorker)
      if (hot != cold && loadPerWorker(hot) > 2 * math.max(1L, loadPerWorker(cold))) {
        // move the hot worker's heaviest keys until roughly even
        val hotKeys = keyToWorker.collect { case (k, w) if w == hot => k }.toSeq
          .sortBy(k => -keyLoad.get(k).get())
        var moved = 0L
        val target = (loadPerWorker(hot) - loadPerWorker(cold)) / 2
        hotKeys.takeWhile { k =>
          // never empty the hot worker entirely; move large keys first
          routing.put(k, Integer.valueOf(cold))
          moved += keyLoad.get(k).get()
          moved < target
        }
        rebalances += 1
      }
    }
  }
}
