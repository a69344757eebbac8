package repro.storage

import java.io.{BufferedInputStream, BufferedOutputStream, DataInputStream, DataOutputStream, File, FileInputStream, FileOutputStream}
import scala.collection.mutable

/** On-disk tier (§7.3) — a miniature RocksDB-shaped LSM, built from
  * scratch because the container ships no RocksDB.
  *
  * Shape preserved from the paper:
  *  - one *column family* per index; each CF owns its SST files and its
  *    eviction (TTL) policy;
  *  - all CFs share a single memtable, which is the refined skiplist with
  *    a composite (key, ts) ordering — same-key data is grouped and
  *    time-range scans are contiguous;
  *  - flush writes sorted SSTs; reads merge memtable + SSTs newest-first;
  *  - compaction merges SSTs and drops entries past their CF's TTL.
  *
  * Values are opaque byte arrays (RowCodec rows in production use).
  */
object DiskStore {
  /** Column-family spec: name + TTL for eviction during compaction. */
  final case class CfSpec(name: String, ttlMs: Long = Long.MaxValue)
}

final class DiskStore(dir: File) {
  import DiskStore.CfSpec

  private final class Cf(val spec: CfSpec) {
    // Shared-memtable contract: entries live in `mem` below; the CF only
    // tracks its SSTs (newest last) and a sequence number.
    val ssts = mutable.ArrayBuffer.empty[File]
    var seq = 0
  }

  // The shared memtable: CF name is folded into the skiplist key so one
  // structure serves every column family, as in §7.3.
  private var mem = new ConcurrentSkipIndex[(String, String, Long), mutable.ArrayBuffer[Array[Byte]]]()(
    Ordering.by { case (cf, k, ts) => (cf, k, -ts) })
  private var memEntries = 0L
  private val cfs = mutable.LinkedHashMap.empty[String, Cf]

  dir.mkdirs()

  def createColumnFamily(spec: CfSpec): Unit = synchronized {
    require(!cfs.contains(spec.name), s"CF ${spec.name} exists")
    cfs(spec.name) = new Cf(spec)
  }

  def put(cf: String, key: String, ts: Long, value: Array[Byte]): Unit = synchronized {
    require(cfs.contains(cf), s"unknown CF $cf")
    mem.getOrInsert((cf, key, ts), mutable.ArrayBuffer.empty[Array[Byte]]) += value
    memEntries += 1
  }

  private def memIter(cf: String): Iterator[((String, Long), Array[Byte])] =
    mem.iteratorFrom((cf, "", Long.MaxValue))
      .takeWhile(_._1._1 == cf)
      .flatMap { case ((_, k, ts), vs) => vs.iterator.map(v => ((k, ts), v)) }

  /** Flush the shared memtable: every CF's entries go to that CF's SST. */
  def flush(): Unit = synchronized {
    for ((name, cf) <- cfs) {
      val entries = memIter(name).toVector // already (key asc, ts desc)
      if (entries.nonEmpty) {
        cf.seq += 1
        val f = new File(dir, f"$name-${cf.seq}%05d.sst")
        writeSst(f, entries)
        cf.ssts += f
      }
    }
    mem = new ConcurrentSkipIndex[(String, String, Long), mutable.ArrayBuffer[Array[Byte]]]()(
      Ordering.by { case (c, k, ts) => (c, k, -ts) })
    memEntries = 0
  }

  private def writeSst(f: File, entries: Seq[((String, Long), Array[Byte])]): Unit = {
    val out = new DataOutputStream(new BufferedOutputStream(new FileOutputStream(f)))
    try {
      out.writeInt(entries.size)
      entries.foreach { case ((k, ts), v) =>
        val kb = k.getBytes("UTF-8")
        out.writeInt(kb.length); out.write(kb)
        out.writeLong(ts)
        out.writeInt(v.length); out.write(v)
      }
    } finally out.close()
  }

  private def readSst(f: File): Vector[((String, Long), Array[Byte])] = {
    val in = new DataInputStream(new BufferedInputStream(new FileInputStream(f)))
    try {
      val n = in.readInt()
      Vector.fill(n) {
        val kl = in.readInt(); val kb = new Array[Byte](kl); in.readFully(kb)
        val ts = in.readLong()
        val vl = in.readInt(); val vb = new Array[Byte](vl); in.readFully(vb)
        ((new String(kb, "UTF-8"), ts), vb)
      }
    } finally in.close()
  }

  /** Range scan: entries for `key` with ts in [lo, hi], newest first,
    * merged across the memtable and every SST of the CF.
    */
  def scan(cf: String, key: String, lo: Long, hi: Long): Seq[(Long, Array[Byte])] = synchronized {
    val c = cfs(cf)
    val fromMem = memIter(cf).collect { case ((k, ts), v) if k == key && ts >= lo && ts <= hi => (ts, v) }
    val fromSst = c.ssts.iterator.flatMap(readSst(_).iterator).collect {
      case ((k, ts), v) if k == key && ts >= lo && ts <= hi => (ts, v)
    }
    (fromMem ++ fromSst).toSeq.sortBy(-_._1)
  }

  /** Most recent value for key with ts <= atOrBefore. */
  def latest(cf: String, key: String, atOrBefore: Long = Long.MaxValue): Option[(Long, Array[Byte])] =
    scan(cf, key, Long.MinValue, atOrBefore).headOption

  /** Merge every SST of each CF into one, dropping entries whose timestamp
    * has passed the CF's TTL relative to `now` (§7.3 eviction-by-parsing-
    * the-composite-key).
    */
  def compact(now: Long): Unit = synchronized {
    for ((name, cf) <- cfs if cf.ssts.nonEmpty) {
      val cutoff = if (cf.spec.ttlMs == Long.MaxValue) Long.MinValue else now - cf.spec.ttlMs
      val merged = cf.ssts.flatMap(readSst).filter(_._1._2 >= cutoff)
        .sortBy { case ((k, ts), _) => (k, -ts) }
      cf.ssts.foreach(_.delete())
      cf.ssts.clear()
      if (merged.nonEmpty) {
        cf.seq += 1
        val f = new File(dir, f"$name-${cf.seq}%05d.sst")
        writeSst(f, merged.toSeq)
        cf.ssts += f
      }
    }
  }

  def sstFiles(cf: String): Seq[File] = synchronized(cfs(cf).ssts.toSeq)

  /** Rebuild CF SST lists from the directory (crash recovery). */
  def recover(specs: Seq[CfSpec]): Unit = synchronized {
    cfs.clear()
    specs.foreach(s => cfs(s.name) = new Cf(s))
    val files = Option(dir.listFiles()).getOrElse(Array.empty).filter(_.getName.endsWith(".sst")).sortBy(_.getName)
    files.foreach { f =>
      val cfName = f.getName.substring(0, f.getName.lastIndexOf('-'))
      cfs.get(cfName).foreach { cf =>
        cf.ssts += f
        cf.seq = math.max(cf.seq, f.getName.drop(cfName.length + 1).takeWhile(_.isDigit).toInt)
      }
    }
  }
}
