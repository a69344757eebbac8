package repro.jobs

/** spark-submit entrypoint for the Figure 6-shaped online MicroBench
  * (request engine vs embedded DuckDB baseline).
  */
object OnlineMicro {
  def main(args: Array[String]): Unit =
    println(repro.bench.OnlineMicro.render(repro.bench.OnlineMicro.run()))
}
