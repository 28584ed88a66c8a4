package repro.core

import scala.util.Random
import repro.tgraph.{TemporalGraph, TemporalGraphGen}
import repro.triangles.{DriverTriangles, TriangleSet}

/** Shared fixtures for the driver-side algorithm suites. */
object TestGraphs {

  /** A hand-built 11-vertex temporal graph in the spirit of the paper's
    * running example (Fig 1): a dense 5-clique core {6..10} with tight
    * timestamps, a looser ring {0..5} and bridges — it exhibits kmax = 5
    * and several distinct k-spans.
    */
  lazy val running: TemporalGraph = TemporalGraph(
    // tight core: 5-clique on 6..10, interactions clustered around t=10
    (6, 7, Seq(9, 12)), (6, 8, Seq(10)), (6, 9, Seq(10, 11)), (6, 10, Seq(9)),
    (7, 8, Seq(11, 30)), (7, 9, Seq(10)), (7, 10, Seq(12)),
    (8, 9, Seq(10, 25)), (8, 10, Seq(11)), (9, 10, Seq(10)),
    // mid community 1..5 with spread-out interactions
    (1, 2, Seq(2, 20)), (1, 3, Seq(5)), (2, 3, Seq(8)),
    (2, 7, Seq(3)), (2, 8, Seq(18)), (3, 7, Seq(6)), (3, 8, Seq(22)),
    (4, 5, Seq(14)), (4, 6, Seq(2)), (4, 7, Seq(15)), (5, 6, Seq(16)), (5, 7, Seq(17)),
    // periphery
    (0, 1, Seq(1)), (0, 3, Seq(28)), (2, 5, Seq(6)),
  )

  def random(seed: Int, nV: Int = 14, pEdge: Double = 0.35,
             horizon: Int = 30, maxStamps: Int = 3): TemporalGraph =
    TemporalGraphGen.randomSmall(new Random(seed), nV, pEdge, horizon, maxStamps)

  def tris(g: TemporalGraph): TriangleSet = DriverTriangles.enumerate(g)

  /** Brute-force edge set of T_{k,δ}: fixpoint peeling over δ-triangles. */
  def bruteTruss(ts: TriangleSet, k: Int, delta: Int): Set[Int] =
    repro.truss.TrussDecomposition.fixpointTruss(ts, k, i => ts.tris(i).mts <= delta)

  /** All (k, δ) pairs worth checking exhaustively on a small graph. */
  def allParams(ts: TriangleSet, kMax: Int): Seq[(Int, Int)] =
    for (k <- 3 to (kMax + 1); d <- 0 to (ts.deltaMax + 1)) yield (k, d)
}
