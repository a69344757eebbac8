package repro.storage

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class SkipListSpec extends AnyFunSuite {

  // ------------------------------------------------- ConcurrentSkipIndex

  test("index: keys come back in sorted order") {
    val idx = new ConcurrentSkipIndex[Long, String]
    Random.shuffle((1L to 200L).toList).foreach(k => idx.getOrInsert(k, s"v$k"))
    assert(idx.iterator.map(_._1).toSeq == (1L to 200L))
  }

  test("index: getOrInsert returns the existing value on duplicate key") {
    val idx = new ConcurrentSkipIndex[String, java.util.concurrent.atomic.AtomicInteger]
    val a = idx.getOrInsert("k", new java.util.concurrent.atomic.AtomicInteger(1))
    val b = idx.getOrInsert("k", new java.util.concurrent.atomic.AtomicInteger(2))
    assert(a eq b)
    assert(idx.size == 1)
  }

  test("index: get on missing key is None") {
    val idx = new ConcurrentSkipIndex[Long, String]
    idx.getOrInsert(5L, "x")
    assert(idx.get(4L).isEmpty && idx.get(5L).contains("x"))
  }

  test("index: iteratorFrom seeks to the ceiling key") {
    val idx = new ConcurrentSkipIndex[Long, String]
    Seq(10L, 20L, 30L).foreach(k => idx.getOrInsert(k, s"v$k"))
    assert(idx.iteratorFrom(15L).map(_._1).toSeq == Seq(20L, 30L))
    assert(idx.iteratorFrom(20L).map(_._1).toSeq == Seq(20L, 30L))
    assert(idx.iteratorFrom(31L).isEmpty)
  }

  test("index: concurrent inserts from 8 threads keep every key, sorted") {
    val idx = new ConcurrentSkipIndex[Int, Int]
    val keys = Random.shuffle((1 to 8000).toList)
    val threads = keys.grouped(1000).map { chunk =>
      new Thread(() => chunk.foreach(k => idx.getOrInsert(k, k)))
    }.toList
    threads.foreach(_.start()); threads.foreach(_.join())
    val got = idx.iterator.map(_._1).toSeq
    assert(got == (1 to 8000))
    assert(idx.size == 8000)
  }

  test("index: concurrent getOrInsert on the same key yields one value") {
    val idx = new ConcurrentSkipIndex[String, Object]
    val results = new java.util.concurrent.ConcurrentLinkedQueue[Object]()
    val threads = (1 to 8).map(_ => new Thread(() =>
      (1 to 500).foreach(_ => results.add(idx.getOrInsert("hot", new Object)))))
    threads.foreach(_.start()); threads.foreach(_.join())
    import scala.jdk.CollectionConverters._
    assert(results.asScala.toSet.size == 1)
  }

  // ----------------------------------------------------------- TimeList

  test("timelist: iterator is newest-first") {
    val tl = new TimeList[String]
    Seq(3L, 1L, 2L, 5L, 4L).foreach(t => tl.insert(TsEntry(t, s"p$t")))
    assert(tl.iterator.map(_.ts).toSeq == Seq(5L, 4L, 3L, 2L, 1L))
  }

  test("timelist: scan returns the closed time range, newest first") {
    val tl = new TimeList[Int]
    (1L to 10L).foreach(t => tl.insert(TsEntry(t, t.toInt)))
    assert(tl.scan(3, 7).map(_.ts).toSeq == Seq(7L, 6L, 5L, 4L, 3L))
  }

  test("timelist: duplicate timestamps are all retained") {
    val tl = new TimeList[Int]
    Seq(5L, 5L, 5L, 3L).foreach(t => tl.insert(TsEntry(t, 0)))
    assert(tl.scan(5, 5).size == 3)
    assert(tl.size == 4)
  }

  test("timelist: latest returns the newest at-or-before entry") {
    val tl = new TimeList[String]
    Seq(10L, 20L, 30L).foreach(t => tl.insert(TsEntry(t, s"p$t")))
    assert(tl.latest().map(_.payload).contains("p30"))
    assert(tl.latest(25L).map(_.payload).contains("p20"))
    assert(tl.latest(5L).isEmpty)
  }

  test("timelist: trimBefore batch-deletes the stale tail") {
    val tl = new TimeList[Int]
    (1L to 100L).foreach(t => tl.insert(TsEntry(t, 0)))
    val removed = tl.trimBefore(40L)
    assert(removed == 39)
    assert(tl.size == 61)
    assert(tl.iterator.map(_.ts).min == 40L)
  }

  test("timelist: trimBefore on an empty or all-fresh list removes nothing") {
    val tl = new TimeList[Int]
    assert(tl.trimBefore(10L) == 0)
    tl.insert(TsEntry(50L, 1))
    assert(tl.trimBefore(10L) == 0 && tl.size == 1)
  }

  test("timelist: concurrent mostly-ascending inserts keep descending order") {
    val tl = new TimeList[Int]
    val threads = (0 until 4).map { t =>
      new Thread(() => (0 until 2000).foreach(i => tl.insert(TsEntry(i.toLong * 4 + t, i))))
    }
    threads.foreach(_.start()); threads.foreach(_.join())
    val ts = tl.iterator.map(_.ts).toSeq
    assert(ts.size == 8000)
    assert(ts == ts.sorted(Ordering[Long].reverse))
  }

  // ---------------------------------------------------- TimeSeriesStore

  test("store: put/scan/latest across keys") {
    val st = new TimeSeriesStore[String, String]
    st.put("a", 1, "a1"); st.put("a", 3, "a3"); st.put("b", 2, "b2")
    assert(st.scan("a", 0, 10).map(_.payload).toSeq == Seq("a3", "a1"))
    assert(st.latest("b", 10).map(_.payload).contains("b2"))
    assert(st.scan("c", 0, 10).isEmpty)
    assert(st.nKeys == 2 && st.nRows == 3)
  }

  test("store: evictBefore trims every key") {
    val st = new TimeSeriesStore[String, Int]
    for (k <- Seq("x", "y"); t <- 1L to 10L) st.put(k, t, 0)
    assert(st.evictBefore(6L) == 10)
    assert(st.nRows == 10)
    assert(st.scan("x", 0, 100).map(_.ts).min == 6L)
  }

  test("store: keys iterate in sorted order") {
    val st = new TimeSeriesStore[String, Int]
    Seq("pear", "apple", "mango").foreach(k => st.put(k, 1, 0))
    assert(st.keys.toSeq == Seq("apple", "mango", "pear"))
  }
}
