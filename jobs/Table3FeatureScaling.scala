package repro.jobs

/** spark-submit entrypoint for paper Table 3 (latency vs feature count).
  *
  *   spark-submit --class repro.jobs.Table3FeatureScaling repro-jobs.jar [nRequests]
  */
object Table3FeatureScaling {
  def main(args: Array[String]): Unit = {
    val n = args.headOption.map(_.toInt).getOrElse(2000)
    println(repro.bench.Table3FeatureScaling.render(repro.bench.Table3FeatureScaling.run(n)))
  }
}
