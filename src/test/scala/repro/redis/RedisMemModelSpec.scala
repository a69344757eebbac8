package repro.redis

import org.scalatest.funsuite.AnyFunSuite

class RedisMemModelSpec extends AnyFunSuite {
  import RedisMemModel._

  test("jemalloc rounding follows the size-class ladder") {
    assert(jemalloc(1) == 8)
    assert(jemalloc(17) == 32)
    assert(jemalloc(24) == 32)
    assert(jemalloc(129) == 160)
    assert(jemalloc(300) == 320)
    assert(jemalloc(600) == 640)
    assert(jemalloc(1100) == 1280)
  }

  test("jemalloc never shrinks and is idempotent") {
    for (s <- Seq(1L, 8L, 31L, 100L, 255L, 511L, 2047L, 5000L)) {
      assert(jemalloc(s) >= s)
      assert(jemalloc(jemalloc(s)) == jemalloc(s))
    }
  }

  test("sds accounts header + data + NUL, rounded") {
    assert(sds(1) == 8)     // 3 + 1 + 1 = 5 -> 8
    assert(sds(10) == 16)   // 3 + 10 + 1 = 14 -> 16
    assert(sds(40) == 48)   // 4 + 40 + 1 = 45 -> 48
  }

  test("expected skiplist node is between the 1-level and capped cost") {
    assert(expectedSkiplistNode >= jemalloc(24 + 16))
    assert(expectedSkiplistNode <= jemalloc(24 + 16 * 32))
    // geometric(0.25) mean level ~1.33 keeps the expectation near the bottom
    assert(expectedSkiplistNode < 64)
  }

  test("per-key overhead dominates per-entry cost (fresh zset is expensive)") {
    assert(perKeyBytes(12) > 2 * perEntryBytes(30))
  }

  test("per-key cost: fresh sorted set lands in the several-hundred-byte range") {
    val k = perKeyBytes(12)
    assert(k > 700 && k < 1300, s"perKeyBytes=$k")
  }

  test("total grows linearly in entries once keys saturate") {
    val t1 = totalBytes(1000000, 1000, 12, 30)
    val t2 = totalBytes(2000000, 1000, 12, 30)
    val perEntry = (t2 - t1) / 1000000.0
    assert(math.abs(perEntry - perEntryBytes(30)) < 1.0)
  }

  test("model reproduces the Table 2 regime: per-tuple cost falls with scale") {
    // few tuples, mostly-unique keys -> expensive; at scale keys amortize
    val small = totalBytes(10000, 7000, 12, 30) / 10000.0
    val large = totalBytes(10000000, 250000, 12, 30) / 10000000.0
    assert(small > 2 * large, s"small=$small large=$large")
  }
}
