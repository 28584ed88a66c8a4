package repro.jobs

import repro.bench.Benchmarks

/** Fig 16-style maintenance comparison: TC-IM / DC-IM per-insertion cost
  * vs MBA rebuild from scratch, over remove-and-reinsert streams.
  * `spark-submit --class repro.jobs.MaintenanceBenchJob repro.jar [dataset ...]`
  */
object MaintenanceBenchJob {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("maintenance-bench")
    try {
      for (cfg <- JobUtil.pick(args))
        println(Benchmarks.maintenanceBench(spark, cfg).formatted)
    } finally spark.stop()
  }
}
