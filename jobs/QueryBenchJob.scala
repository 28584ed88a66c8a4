package repro.jobs

import repro.bench.Benchmarks

/** Fig 10-style query-processing comparison (Online vs TC vs DC) at the
  * paper defaults k = 30%·kmax, δ = 60%·δmax.
  * `spark-submit --class repro.jobs.QueryBenchJob repro.jar [dataset ...]`
  */
object QueryBenchJob {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("query-bench")
    try {
      for (cfg <- JobUtil.pick(args))
        println(Benchmarks.queryBench(spark, cfg).formatted)
    } finally spark.stop()
  }
}
