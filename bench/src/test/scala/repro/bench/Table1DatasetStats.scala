package repro.bench

import repro.SparkSpec
import repro.tgraph.{GraphStats, TemporalGraphGen}

/** Reproduces paper **Table I** (dataset statistics) on the eight synthetic
  * analogs. Paper values are quoted in EXPERIMENTS.md next to this output;
  * the assertions pin the *shape*: kmax stays in the paper's narrow band
  * despite |E| varying by ~15×, δmax tracks n, and the Youtube analog is
  * the small-n outlier.
  */
class Table1DatasetStats extends SparkSpec {

  private lazy val stats =
    Benchmarks.table1(spark, TemporalGraphGen.datasets)

  test("print Table I") {
    println("==== TABLE I: dataset statistics (synthetic analogs) ====")
    println(GraphStats.header)
    stats.foreach(s => println(s.row))
  }

  test("kmax matches the paper's Table I column exactly") {
    val paperKmax = Map(
      "email-lite" -> 23, "mathoverflow-lite" -> 42, "askubuntu-lite" -> 26,
      "superuser-lite" -> 35, "wikitalk-lite" -> 49, "youtube-lite" -> 33,
      "stackoverflow-lite" -> 79, "wikipedia-lite" -> 59)
    for (s <- stats) assert(s.kMax == paperKmax(s.name), s.name)
  }

  test("deltaMax is a large fraction of n (triangles as loose as the graph lifetime)") {
    // email-lite sits lowest (~0.64·n: its high |τ| tightens windows);
    // every other analog reaches > 0.9·n like the paper's datasets
    for (s <- stats) assert(s.deltaMax > s.numTimestamps * 0.55, s.name)
  }

  test("n matches the paper's horizon per dataset") {
    val paperN = Map(
      "email-lite" -> 803, "mathoverflow-lite" -> 2450, "askubuntu-lite" -> 2613,
      "superuser-lite" -> 2773, "wikitalk-lite" -> 2320, "youtube-lite" -> 225,
      "stackoverflow-lite" -> 2774, "wikipedia-lite" -> 2235)
    for (s <- stats) assert(s.numTimestamps <= paperN(s.name) &&
      s.numTimestamps > paperN(s.name) * 0.9, s.name)
  }

  test("size ordering matches the paper: email smallest, wikipedia largest") {
    val byName = stats.map(s => s.name -> s).toMap
    assert(byName("email-lite").numEdges == stats.map(_.numEdges).min)
    assert(byName("wikipedia-lite").numEdges == stats.map(_.numEdges).max)
    assert(byName("email-lite").avgTau == stats.map(_.avgTau).max) // |τ|=11.5 outlier
    // youtube > wikitalk, as in Table I
    assert(byName("youtube-lite").numEdges > byName("wikitalk-lite").numEdges)
  }

  test("every analog has a rich triangle population") {
    for (s <- stats) assert(s.numTriangles > s.numEdges / 2, s.name)
  }
}
