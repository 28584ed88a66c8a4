package repro.jobs

import repro.bench.Benchmarks

/** Fig 14-style index-construction comparison (DBA vs MBA).
  * `spark-submit --class repro.jobs.ConstructionBenchJob repro.jar [dataset ...]`
  */
object ConstructionBenchJob {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("construction-bench")
    try {
      for (cfg <- JobUtil.pick(args))
        println(Benchmarks.constructionBench(spark, cfg).formatted)
    } finally spark.stop()
  }
}
