package repro.bench

import repro.SparkSpec
import repro.tgraph.TemporalGraphGen

/** Reproduces paper **Table II** (index statistics). Shape assertions:
  * DC-Index never stores more edges than TC-Index, total edge # stays a
  * small multiple of |E| (paper: 1.5×–10.4×), compression ratio vs explicit
  * truss storage reaches the 1e-3..1e-4 regime everywhere except the
  * small-δmax Youtube analog — the paper's own anomaly.
  */
class Table2IndexStats extends SparkSpec {

  private lazy val rows = Benchmarks.table2(spark, TemporalGraphGen.datasets)

  test("print Table II") {
    println("==== TABLE II: index statistics ====")
    println(Benchmarks.table2Header)
    rows.foreach(r => println(r.formatted))
  }

  test("DC-Index stores no more edge entries than TC-Index") {
    for (r <- rows) assert(r.dcTotalEdges <= r.tcTotalEdges, r.name)
  }

  test("total edge # per |E| stays within the paper's small-multiple band") {
    for (r <- rows) assert(r.dcOverE >= 1.0 && r.dcOverE < 25.0, s"${r.name}: ${r.dcOverE}")
  }

  test("compression ratio reaches the 1e-3 regime on large-deltaMax datasets") {
    for (r <- rows if r.name != "youtube-lite")
      assert(r.compression < 5e-3, s"${r.name}: ${r.compression}")
  }

  test("youtube analog is the worst compression ratio (paper's small-n anomaly)") {
    val yt = rows.find(_.name == "youtube-lite").get
    assert(rows.forall(r => r.name == "youtube-lite" || r.compression < yt.compression))
  }

  test("avg entry count scales with deltaMax, not graph size") {
    val byName = rows.map(r => r.name -> r).toMap
    // youtube (n=225) must have far fewer directory entries than
    // stackoverflow (n=2774) despite comparable |E|
    assert(byName("youtube-lite").avgEntry < byName("stackoverflow-lite").avgEntry / 2)
  }
}
