package repro.redis

/** Analytic memory model for the paper's Trino+Redis baseline (Table 2).
  *
  * The container has no Redis, so we model Redis 6 (64-bit, jemalloc)
  * storing one sorted set per index key (the natural Trino-over-Redis
  * layout for "rows for key k ordered by timestamp": ZADD key ts row).
  * Sorted sets are in skiplist+dict encoding — realistic feature rows
  * exceed `zset-max-ziplist-value`, and production deployments disable
  * ziplist conversion to avoid the re-encode latency spike the paper
  * calls out for Redis rehashing.
  *
  * Every constant below is a struct size from the Redis source
  * (dictEntry 24 B, robj 16 B, zskiplistNode 24 B + 16 B/level,
  * 32-level header, sds8 header 4 B) rounded to jemalloc size classes.
  */
object RedisMemModel {

  /** jemalloc small/large size-class rounding. */
  def jemalloc(size: Long): Long = {
    if (size <= 8) 8
    else if (size <= 128) (size + 15) / 16 * 16          // 16..128 step 16
    else if (size <= 256) (size + 31) / 32 * 32          // 160..256 step 32
    else if (size <= 512) (size + 63) / 64 * 64
    else if (size <= 1024) (size + 127) / 128 * 128
    else if (size <= 2048) (size + 255) / 256 * 256
    else {
      // spacing = 2^(floor(log2(size-1)) - 2)
      var step = 512L
      while (step * 8 < size) step *= 2
      (size + step - 1) / step * step
    }
  }

  /** sds allocation for a string of `len` bytes (header + data + NUL). */
  def sds(len: Long): Long = {
    val hdr = if (len < 32) 3 else if (len < 256) 4 else if (len < 65536) 6 else 10
    jemalloc(hdr + len + 1)
  }

  private val DictEntry = jemalloc(24)
  /** Expected bucket-pointer bytes per entry: 8 B per slot, power-of-two
    * table at load factor <= 1 averages ~1.5 slots per entry.
    */
  private val BucketPerEntry = 12L
  private val Robj = jemalloc(16)

  /** Expected zskiplistNode allocation: 24 B fixed + 16 B per level,
    * level ~ Geometric(p=0.25), capped at 32.
    */
  val expectedSkiplistNode: Double = {
    var e = 0.0; var p = 1.0
    for (lvl <- 1 to 32) {
      val prob = if (lvl == 32) p else p * 0.75
      e += prob * jemalloc(24 + 16L * lvl)
      p *= 0.25
    }
    e
  }

  /** Fixed cost of one sorted-set key: main-dict entry + key sds + robj +
    * zset struct + inner dict + zskiplist struct + 32-level header node.
    */
  def perKeyBytes(keyLen: Int): Long =
    DictEntry + BucketPerEntry + sds(keyLen) + Robj +
      jemalloc(16) /* zset */ + jemalloc(96) /* inner dict */ +
      jemalloc(32) /* zskiplist */ + jemalloc(24 + 16L * 32) /* header node */

  /** Cost of one member (one stored tuple): member sds (shared between the
    * skiplist node and the dict), skiplist node, inner-dict entry+bucket.
    */
  def perEntryBytes(memberLen: Int): Double =
    sds(memberLen) + expectedSkiplistNode + DictEntry + BucketPerEntry

  /** Total bytes for a dataset of `nTuples` rows over `nUniqueKeys` keys. */
  def totalBytes(nTuples: Long, nUniqueKeys: Long, keyLen: Int, memberLen: Int): Long =
    nUniqueKeys * perKeyBytes(keyLen) + (nTuples * perEntryBytes(memberLen)).toLong
}
