package repro.core.functions

import repro.SparkSpec

/** The Catalyst scalar extensions, called from SQL text (they live in the
  * session's function registry, not in a UDF wrapper).
  */
class ExpressionsSpec extends SparkSpec {

  private def sql1(q: String): Any = {
    Expressions.register(spark)
    spark.sql(q).collect()(0).get(0)
  }

  test("split_by_key splits and keeps keys") {
    assert(sql1("SELECT split_by_key('a:1,b:2,c:3', ',', ':')")
      .asInstanceOf[scala.collection.Seq[String]].toSeq == Seq("a", "b", "c"))
  }

  test("split_by_key with missing kv delimiter keeps the segment") {
    assert(sql1("SELECT split_by_key('plain,b:2', ',', ':')")
      .asInstanceOf[scala.collection.Seq[String]].toSeq == Seq("plain", "b"))
  }

  test("split_by_key of NULL input is NULL") {
    assert(sql1("SELECT split_by_key(CAST(NULL AS STRING), ',', ':')") == null)
  }

  test("split_by_key result works with SQL array functions") {
    assert(sql1("SELECT size(split_by_key('a:1,b:2', ',', ':'))") == 2)
  }

  test("multiclass_label passes ints through") {
    assert(sql1("SELECT multiclass_label(7)") == 7)
  }

  test("multiclass_label truncates doubles") {
    assert(sql1("SELECT multiclass_label(7.9)") == 7)
  }

  test("multiclass_label hashes strings into [0, 2^20)") {
    val h = sql1("SELECT multiclass_label('cat')").asInstanceOf[Int]
    assert(h >= 0 && h < (1 << 20))
    assert(sql1("SELECT multiclass_label('cat')") == h) // stable
  }

  test("multiclass_label of NULL is NULL") {
    assert(sql1("SELECT multiclass_label(CAST(NULL AS STRING))") == null)
  }

  test("sig_label renders the raw value") {
    assert(sql1("SELECT sig_label(42)") == "42")
    assert(sql1("SELECT sig_label('x')") == "x")
  }

  test("sig_continuous renders idx:value") {
    assert(sql1("SELECT sig_continuous(3, CAST(2.5 AS DOUBLE))") == "3:2.5")
  }

  test("sig_discrete hashes into the dim range with base offset") {
    val s = sql1("SELECT sig_discrete(100, 'shoes', 50)").asInstanceOf[String]
    val idx = s.stripSuffix(":1").toInt
    assert(idx >= 100 && idx < 150)
    assert(idx - 100 == AggCore.featureHash("shoes", 50))
  }

  test("expressions evaluate per-row over a table") {
    Expressions.register(spark)
    import spark.implicits._
    val df = Seq("a:1,b:2", "x:9").toDF("s")
    df.createOrReplaceTempView("strs")
    val out = spark.sql("SELECT size(split_by_key(s, ',', ':')) AS n FROM strs ORDER BY n").collect()
    assert(out.map(_.getInt(0)).toSeq == Seq(1, 2))
  }

  test("registration survives and is idempotent") {
    Expressions.register(spark); Expressions.register(spark)
    assert(sql1("SELECT sig_label(1)") == "1")
  }
}
