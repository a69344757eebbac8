package repro

import scala.util.Random

/** Driver-local deterministic generators for the online engines (request
  * mode, streaming union) and the analytic memory models, where spinning
  * up a Spark job per micro-measurement would drown the signal.
  */
object LocalGen {

  /** Zipf sampler over ranks 1..n with exponent `alpha` (inverse-CDF on a
    * precomputed cumulative table — exact, not the truncated approximation
    * used by the Spark-side generator).
    */
  final class Zipf(n: Int, alpha: Double, seed: Long) {
    private val rnd = new Random(seed)
    private val cum: Array[Double] = {
      val w = Array.tabulate(n)(i => 1.0 / math.pow(i + 1.0, alpha))
      val c = new Array[Double](n)
      var s = 0.0
      var i = 0
      while (i < n) { s += w(i); c(i) = s; i += 1 }
      var j = 0
      while (j < n) { c(j) /= s; j += 1 }
      c
    }
    /** 1-based rank. */
    def next(): Int = {
      val u = rnd.nextDouble()
      val idx = java.util.Arrays.binarySearch(cum, u)
      (if (idx >= 0) idx else -idx - 1) + 1
    }
    /** Probability of rank k (1-based). */
    def p(k: Int): Double = if (k == 1) cum(0) else cum(k - 1) - cum(k - 2)
    /** Expected unique ranks after `draws` samples: Σ 1-(1-p_k)^draws. */
    def expectedUnique(draws: Long): Double = {
      var e = 0.0
      var k = 1
      while (k <= n) {
        val pk = p(k)
        e += 1.0 - math.exp(draws * math.log1p(-pk))
        k += 1
      }
      e
    }
  }

  /** One TalkingData-lite click (matches `SynthData.clicks` columns). */
  final case class Click(ip: String, app: Int, device: Int, os: Int, channel: Int,
                         clickTime: Long, isAttributed: Boolean)

  def clicks(n: Int, nIps: Int = 278000, alpha: Double = 1.05, seed: Long = 7): Seq[Click] = {
    val z = new Zipf(nIps, alpha, seed)
    val rnd = new Random(seed + 1)
    (0 until n).map { _ =>
      Click(s"ip_${z.next()}", rnd.nextInt(500), rnd.nextInt(3000), rnd.nextInt(800),
        rnd.nextInt(200), 1510000000000L + rnd.nextLong(4L * 86400000L), rnd.nextDouble() < 0.002)
    }
  }

  /** Events for the streaming union engines: tuples from `nTables` tables
    * over a zipf key space, timestamps strictly increasing (1 ms apart) so
    * per-key ordering is unambiguous.
    */
  def unionStream(n: Int, nKeys: Int, nTables: Int = 3, alpha: Double = 1.2,
                  seed: Long = 17): IndexedSeq[repro.core.online.WindowUnionStream.StreamTuple] = {
    val z = new Zipf(nKeys, alpha, seed)
    val rnd = new Random(seed + 1)
    (0 until n).map { i =>
      repro.core.online.WindowUnionStream.StreamTuple(
        rnd.nextInt(nTables), s"k${z.next()}", i.toLong, rnd.nextDouble())
    }
  }
}
