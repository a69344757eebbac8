package repro.core.offline

import org.apache.spark.sql.functions._
import repro.SparkSpec

class PreAggRewriteSpec extends SparkSpec {
  import PreAggRewrite._

  private lazy val base = {
    import spark.implicits._
    val rnd = new scala.util.Random(5)
    (1 to 2000).map { _ =>
      (s"u${rnd.nextInt(5)}", rnd.nextInt(10000).toLong, rnd.nextInt(100).toDouble)
    }.toDF("key", "ts", "v")
  }

  private def setup(): org.apache.spark.sql.DataFrame = {
    install(spark)
    clear()
    val pre = buildPreAgg(base, "key", "ts", "v", bucketMs = 100L)
    register("clicks", Registration(pre, "key", "ts", "v", 100L))
    tagged(spark, base, "clicks")
  }

  private def canon(df: org.apache.spark.sql.DataFrame): Seq[String] =
    df.collect().map(_.toSeq.map {
      case d: Double => f"$d%.6f"
      case x         => String.valueOf(x)
    }.mkString("|")).sorted.toSeq

  test("aligned sum+count rewrite fires and matches the raw plan") {
    val t = setup()
    t.createOrReplaceTempView("clicks_t")
    val q = "SELECT key, sum(v) AS s, count(v) AS c FROM clicks_t " +
      "WHERE ts >= 1000 AND ts <= 4999 GROUP BY key"
    val before = rewriteHits.get()
    val got = canon(spark.sql(q))
    assert(rewriteHits.get() == before + 1, "rewrite should have fired")
    base.createOrReplaceTempView("raw_base")
    val expect = canon(spark.sql(
      "SELECT key, sum(v) AS s, count(v) AS c FROM raw_base WHERE ts >= 1000 AND ts <= 4999 GROUP BY key"))
    assert(got == expect)
  }

  test("min/max/avg rewrite matches the raw plan") {
    val t = setup()
    t.createOrReplaceTempView("clicks_t")
    val q = "SELECT key, min(v) AS mn, max(v) AS mx, avg(v) AS av FROM clicks_t " +
      "WHERE ts >= 0 AND ts <= 9999 GROUP BY key"
    val before = rewriteHits.get()
    val got = canon(spark.sql(q))
    assert(rewriteHits.get() == before + 1)
    base.createOrReplaceTempView("raw_base")
    val expect = canon(spark.sql(
      "SELECT key, min(v) AS mn, max(v) AS mx, avg(v) AS av FROM raw_base WHERE ts >= 0 AND ts <= 9999 GROUP BY key"))
    assert(got == expect)
  }

  test("non-aligned ranges are NOT rewritten but still answer correctly") {
    val t = setup()
    t.createOrReplaceTempView("clicks_t")
    val before = rewriteHits.get()
    val got = canon(spark.sql(
      "SELECT key, sum(v) AS s FROM clicks_t WHERE ts >= 1013 AND ts <= 4987 GROUP BY key"))
    assert(rewriteHits.get() == before, "unaligned range must not use bucket partials")
    base.createOrReplaceTempView("raw_base")
    val expect = canon(spark.sql(
      "SELECT key, sum(v) AS s FROM raw_base WHERE ts >= 1013 AND ts <= 4987 GROUP BY key"))
    assert(got == expect)
  }

  test("queries without the marker are untouched") {
    setup()
    base.createOrReplaceTempView("raw_base")
    val before = rewriteHits.get()
    spark.sql("SELECT key, sum(v) AS s FROM raw_base WHERE ts >= 0 AND ts <= 999 GROUP BY key").collect()
    assert(rewriteHits.get() == before)
  }

  test("markers left unconsumed are stripped so plain scans work") {
    val t = setup()
    // no aggregate at all — the marker must not break execution
    assert(t.filter(col("ts") < 100).count() ==
      base.filter(col("ts") < 100).count())
  }

  test("unsupported aggregates fall back to the raw plan") {
    val t = setup()
    t.createOrReplaceTempView("clicks_t")
    val before = rewriteHits.get()
    val got = canon(spark.sql(
      "SELECT key, percentile_approx(v, 0.5) AS p FROM clicks_t WHERE ts >= 0 AND ts <= 999 GROUP BY key"))
    assert(rewriteHits.get() == before)
    assert(got.nonEmpty)
  }

  test("install is idempotent (one rule instance in extraOptimizations)") {
    install(spark); install(spark)
    val rules = spark.experimental.extraOptimizations.count(_.isInstanceOf[RewriteRule])
    assert(rules == 1)
  }

  test("rewrite scans far fewer rows: pre-agg table is smaller than base") {
    val pre = buildPreAgg(base, "key", "ts", "v", 100L)
    assert(pre.count() < base.count())
    // partial correctness of the companion itself
    val total = pre.agg(sum("cnt")).collect()(0).getLong(0)
    assert(total == base.count())
  }
}
