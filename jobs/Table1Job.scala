package repro.jobs

import repro.bench.Benchmarks
import repro.tgraph.GraphStats

/** Paper Table I — dataset statistics of the eight synthetic analogs.
  * `spark-submit --class repro.jobs.Table1Job repro.jar [dataset ...]`
  */
object Table1Job {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("table1-dataset-stats")
    try {
      println(GraphStats.header)
      Benchmarks.table1(spark, JobUtil.pick(args)).foreach(s => println(s.row))
    } finally spark.stop()
  }
}
