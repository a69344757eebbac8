package repro.storage

import java.io.File
import java.nio.file.Files
import org.scalatest.funsuite.AnyFunSuite
import repro.storage.DiskStore.CfSpec

class DiskStoreSpec extends AnyFunSuite {

  private def freshDir(): File = Files.createTempDirectory("diskstore").toFile
  private def b(s: String): Array[Byte] = s.getBytes("UTF-8")
  private def s(a: Array[Byte]): String = new String(a, "UTF-8")

  test("put + scan from memtable only") {
    val db = new DiskStore(freshDir())
    db.createColumnFamily(CfSpec("ip"))
    db.put("ip", "k1", 10, b("a")); db.put("ip", "k1", 20, b("b")); db.put("ip", "k2", 15, b("c"))
    assert(db.scan("ip", "k1", 0, 100).map(e => (e._1, s(e._2))) == Seq((20L, "b"), (10L, "a")))
  }

  test("scan respects the closed time range") {
    val db = new DiskStore(freshDir())
    db.createColumnFamily(CfSpec("ip"))
    (1L to 10L).foreach(t => db.put("ip", "k", t, b(t.toString)))
    assert(db.scan("ip", "k", 3, 6).map(_._1) == Seq(6L, 5L, 4L, 3L))
  }

  test("flush writes one SST per CF and empties the memtable") {
    val db = new DiskStore(freshDir())
    db.createColumnFamily(CfSpec("a")); db.createColumnFamily(CfSpec("b"))
    db.put("a", "k", 1, b("x")); db.put("b", "k", 2, b("y"))
    db.flush()
    assert(db.sstFiles("a").size == 1 && db.sstFiles("b").size == 1)
    assert(db.scan("a", "k", 0, 10).map(e => s(e._2)) == Seq("x"))
  }

  test("reads merge memtable and SSTs newest-first") {
    val db = new DiskStore(freshDir())
    db.createColumnFamily(CfSpec("cf"))
    db.put("cf", "k", 10, b("old")); db.flush()
    db.put("cf", "k", 30, b("new"))
    assert(db.scan("cf", "k", 0, 100).map(e => s(e._2)) == Seq("new", "old"))
  }

  test("latest returns the newest at-or-before value across tiers") {
    val db = new DiskStore(freshDir())
    db.createColumnFamily(CfSpec("cf"))
    db.put("cf", "k", 10, b("v10")); db.flush()
    db.put("cf", "k", 20, b("v20"))
    assert(db.latest("cf", "k").map(e => s(e._2)).contains("v20"))
    assert(db.latest("cf", "k", 15).map(e => s(e._2)).contains("v10"))
    assert(db.latest("cf", "missing").isEmpty)
  }

  test("column families are isolated") {
    val db = new DiskStore(freshDir())
    db.createColumnFamily(CfSpec("x")); db.createColumnFamily(CfSpec("y"))
    db.put("x", "k", 1, b("in-x"))
    assert(db.scan("y", "k", 0, 10).isEmpty)
  }

  test("compaction merges SSTs into one") {
    val db = new DiskStore(freshDir())
    db.createColumnFamily(CfSpec("cf"))
    db.put("cf", "k", 1, b("a")); db.flush()
    db.put("cf", "k", 2, b("b")); db.flush()
    assert(db.sstFiles("cf").size == 2)
    db.compact(now = 100)
    assert(db.sstFiles("cf").size == 1)
    assert(db.scan("cf", "k", 0, 10).size == 2)
  }

  test("compaction drops entries past the CF's TTL") {
    val db = new DiskStore(freshDir())
    db.createColumnFamily(CfSpec("cf", ttlMs = 50))
    db.put("cf", "k", 10, b("stale")); db.put("cf", "k", 90, b("fresh")); db.flush()
    db.compact(now = 100) // cutoff = 50: ts=10 dropped, ts=90 kept
    assert(db.scan("cf", "k", 0, 100).map(e => s(e._2)) == Seq("fresh"))
  }

  test("TTL policies are per column family") {
    val db = new DiskStore(freshDir())
    db.createColumnFamily(CfSpec("short", ttlMs = 10))
    db.createColumnFamily(CfSpec("long", ttlMs = 1000))
    db.put("short", "k", 10, b("s")); db.put("long", "k", 10, b("l")); db.flush()
    db.compact(now = 100)
    assert(db.scan("short", "k", 0, 100).isEmpty)
    assert(db.scan("long", "k", 0, 100).size == 1)
  }

  test("recover rebuilds SST lists from disk") {
    val dir = freshDir()
    val db = new DiskStore(dir)
    db.createColumnFamily(CfSpec("cf"))
    db.put("cf", "k", 5, b("persisted")); db.flush()
    val db2 = new DiskStore(dir)
    db2.recover(Seq(CfSpec("cf")))
    assert(db2.scan("cf", "k", 0, 10).map(e => s(e._2)) == Seq("persisted"))
    // sequence numbers continue after recovery (no filename collisions)
    db2.put("cf", "k", 6, b("post")); db2.flush()
    assert(db2.sstFiles("cf").size == 2)
  }

  test("put into an unknown CF is rejected") {
    val db = new DiskStore(freshDir())
    intercept[IllegalArgumentException](db.put("nope", "k", 1, b("x")))
  }

  test("keys sharing a prefix do not bleed into each other") {
    val db = new DiskStore(freshDir())
    db.createColumnFamily(CfSpec("cf"))
    db.put("cf", "user1", 1, b("a")); db.put("cf", "user10", 1, b("b"))
    assert(db.scan("cf", "user1", 0, 10).map(e => s(e._2)) == Seq("a"))
  }
}
