package repro.jobs

/** spark-submit entrypoint for the Figure 10/11-shaped long-window
  * pre-aggregation ablation.
  */
object PreAggAblation {
  def main(args: Array[String]): Unit =
    println(repro.bench.PreAggAblation.render(repro.bench.PreAggAblation.run()))
}
