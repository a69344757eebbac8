package repro.core.functions

import repro.SparkSpec

class SignaturesSpec extends SparkSpec {
  import Signatures._

  private lazy val df = {
    import spark.implicits._
    Seq(
      (1, 0.5, 10.0, "shoes", "mobile"),
      (0, 1.5, 20.0, "books", "web"),
    ).toDF("label", "f1", "f2", "cat", "channel")
  }

  private val layout = Layout("label", continuous = Seq("f1", "f2"),
    discrete = Seq(("cat", 100), ("channel", 10)))

  test("layout assigns continuous slots then discrete base offsets") {
    assert(layout.continuousBase == Map("f1" -> 0, "f2" -> 1))
    assert(layout.discreteBase == Map("cat" -> 2, "channel" -> 102))
    assert(layout.dim == 112)
  }

  test("libsvm lines start with the label") {
    val lines = toLibsvm(spark, df, layout).collect()
    assert(lines.forall(l => l.startsWith("1 ") || l.startsWith("0 ")))
  }

  test("continuous features render idx:value in their slots") {
    val l = toLibsvm(spark, df, layout).collect().find(_.startsWith("1 ")).get
    assert(l.contains("0:0.5") && l.contains("1:10.0"))
  }

  test("discrete features land in their hash range with :1 values") {
    val l = toLibsvm(spark, df, layout).collect().head
    val terms = l.split(" ").drop(1).map { t =>
      val Array(i, v) = t.split(":"); (i.toInt, v)
    }
    val catTerm = terms.find(t => t._1 >= 2 && t._1 < 102).get
    val chTerm  = terms.find(t => t._1 >= 102 && t._1 < 112).get
    assert(catTerm._2 == "1" && chTerm._2 == "1")
  }

  test("hash index matches featureHash for the raw value") {
    val l = toLibsvm(spark, df, layout).collect().find(_.startsWith("1 ")).get
    val idx = l.split(" ").drop(1).map(_.split(":")(0).toInt).find(i => i >= 2 && i < 102).get
    assert(idx == 2 + AggCore.featureHash("shoes", 100))
  }

  test("null columns are skipped (sparse output)") {
    import spark.implicits._
    val withNull = Seq((1, Option.empty[Double], Option("x"))).toDF("label", "f1", "cat")
    val lay = Layout("label", Seq("f1"), Seq(("cat", 10)))
    val line = toLibsvm(spark, withNull, lay).collect().head
    assert(!line.contains("0:"))
    assert(line.split(" ").length == 2) // label + cat term only
  }

  test("dimensionality is constant regardless of row content") {
    val lines = toLibsvm(spark, df, layout).collect()
    lines.foreach { l =>
      l.split(" ").drop(1).foreach { t =>
        val i = t.split(":")(0).toInt
        assert(i >= 0 && i < layout.dim)
      }
    }
  }

  test("same discrete value always hashes to the same slot (train/serve consistency)") {
    val a = toLibsvm(spark, df, layout).collect()
    val b = toLibsvm(spark, df, layout).collect()
    assert(a.toSeq == b.toSeq)
  }
}
