package repro.jobs

import org.apache.spark.sql.SparkSession

/** spark-submit entrypoint for the Figure 8/12-shaped multi-window
  * parallel optimization benchmark.
  */
object OfflineMultiWindow {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("offline-multiwindow")
      .config("spark.sql.shuffle.partitions", "64")
      .getOrCreate()
    println(repro.bench.OfflineMultiWindow.render(repro.bench.OfflineMultiWindow.run(spark)))
    spark.stop()
  }
}
