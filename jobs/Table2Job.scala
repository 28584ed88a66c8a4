package repro.jobs

import repro.bench.Benchmarks

/** Paper Table II — index statistics (TC/DC sizes, compression ratio).
  * `spark-submit --class repro.jobs.Table2Job repro.jar [dataset ...]`
  */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("table2-index-stats")
    try {
      println(Benchmarks.table2Header)
      Benchmarks.table2(spark, JobUtil.pick(args)).foreach(r => println(r.formatted))
    } finally spark.stop()
  }
}
