package repro.bench

import repro.SparkSpec
import repro.tgraph.TemporalGraphGen

/** Backs Fig 15: with coarsened time granularity (every 20/25/30/35/40
  * timestamps merged), δmax shrinks, horizontal IESes grow heavier, the
  * arborescence picks more vertical edges — and DC-Index regains a clear
  * size advantage over TC-Index.
  */
class Claim4CoarseningBench extends SparkSpec {

  private lazy val rows = Seq("email-lite", "mathoverflow-lite").flatMap { n =>
    Benchmarks.coarseningBench(spark, TemporalGraphGen.byName(n), Seq(20, 25, 30, 35, 40))
  }

  test("print coarsening comparison (Fig 15 analog)") {
    println("==== CLAIM 4: DC vs TC total edges under time coarsening ====")
    rows.foreach(r => println(r.formatted))
  }

  test("coarsening shrinks deltaMax monotonically") {
    for (byDs <- rows.groupBy(_.name).values) {
      val sorted = byDs.sortBy(_.factor)
      for (Seq(a, b) <- sorted.sliding(2))
        assert(b.deltaMax <= a.deltaMax, s"${a.name} factor ${b.factor}")
    }
  }

  test("DC advantage over TC grows as granularity coarsens") {
    for (byDs <- rows.groupBy(_.name).values) {
      val sorted = byDs.sortBy(_.factor)
      val fine = sorted.head   // original granularity
      val coarse = sorted.last // most coarsened
      val fineRatio = fine.dcEdges.toDouble / fine.tcEdges
      val coarseRatio = coarse.dcEdges.toDouble / coarse.tcEdges
      assert(coarseRatio <= fineRatio, s"${fine.name}: $fineRatio -> $coarseRatio")
    }
  }

  test("DC is strictly smaller than TC at the coarsest granularity") {
    for (byDs <- rows.groupBy(_.name).values) {
      val coarse = byDs.maxBy(_.factor)
      assert(coarse.dcEdges < coarse.tcEdges, coarse.name)
    }
  }
}
