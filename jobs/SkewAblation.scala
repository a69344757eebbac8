package repro.jobs

import org.apache.spark.sql.SparkSession

/** spark-submit entrypoint for the Figure 13-shaped data-skew ablation. */
object SkewAblation {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("skew-ablation")
      .config("spark.sql.shuffle.partitions", "64")
      .getOrCreate()
    println(repro.bench.SkewAblation.render(repro.bench.SkewAblation.run(spark)))
    spark.stop()
  }
}
