package repro.jobs

import repro.bench.Benchmarks

/** Fig 15-style experiment: coarsen time granularity (merge 20/25/30/35/40
  * consecutive timestamps) and compare DC vs TC total edge counts.
  * `spark-submit --class repro.jobs.CoarseningJob repro.jar [dataset ...]`
  */
object CoarseningJob {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("coarsening-bench")
    try {
      val cfgs = if (args.isEmpty) Seq(repro.tgraph.TemporalGraphGen.byName("email-lite"),
        repro.tgraph.TemporalGraphGen.byName("mathoverflow-lite"))
      else JobUtil.pick(args)
      for (cfg <- cfgs; row <- Benchmarks.coarseningBench(spark, cfg, Seq(20, 25, 30, 35, 40)))
        println(row.formatted)
    } finally spark.stop()
  }
}
