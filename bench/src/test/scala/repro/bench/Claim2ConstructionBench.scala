package repro.bench

import repro.SparkSpec
import repro.tgraph.TemporalGraphGen

/** Backs Fig 14: MBA constructs the index faster than DBA on every dataset
  * (each triangle is invalidated once overall instead of once per k), and
  * construction time grows steadily with graph scale.
  */
class Claim2ConstructionBench extends SparkSpec {

  private lazy val rows =
    TemporalGraphGen.datasets.map(cfg => Benchmarks.constructionBench(spark, cfg))

  test("print construction comparison (Fig 14 analog)") {
    println("==== CLAIM 2: index construction, DBA vs MBA ====")
    rows.foreach(r => println(r.formatted))
  }

  test("MBA is faster than DBA on every dataset") {
    for (r <- rows) assert(r.mbaMs < r.dbaMs, s"${r.name}: mba=${r.mbaMs} dba=${r.dbaMs}")
  }

  test("construction scales with graph size (largest > smallest)") {
    val byName = rows.map(r => r.name -> r).toMap
    assert(byName("stackoverflow-lite").mbaMs > byName("email-lite").mbaMs)
  }
}
