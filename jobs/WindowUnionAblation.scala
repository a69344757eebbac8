package repro.jobs

/** spark-submit entrypoint for the §9.3.2-shaped self-adjusting window
  * union throughput benchmark.
  */
object WindowUnionAblation {
  def main(args: Array[String]): Unit =
    println(repro.bench.WindowUnionAblation.render(repro.bench.WindowUnionAblation.run()))
}
