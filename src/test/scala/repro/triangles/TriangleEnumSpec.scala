package repro.triangles

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.core.TestGraphs
import repro.dist.GraphXCheck
import repro.tgraph.{TemporalGraph, TemporalGraphGen}

/** Spark triangle enumeration + mts (S4) against the driver reference, a
  * DuckDB SQL oracle, and GraphX triangle counting.
  */
class TriangleEnumSpec extends SparkSpec {

  private def sparkTris(g: TemporalGraph): Set[(Int, Int, Int, Int)] =
    TriangleEnum.triangles(TemporalGraph.toGroupedDF(spark, g))
      .collect().map(r => (r.getInt(0), r.getInt(1), r.getInt(2), r.getInt(3))).toSet

  private def driverTris(g: TemporalGraph): Set[(Int, Int, Int, Int)] = {
    val ts = DriverTriangles.enumerate(g)
    ts.tris.map { t =>
      // edge ids back to vertex triple a < b < c
      val vs = Array(t.e1, t.e2, t.e3).flatMap(e => Array(g.edges(e).u, g.edges(e).v))
        .distinct.sorted
      (vs(0), vs(1), vs(2), t.mts)
    }.toSet
  }

  for (seed <- 0 until 6) {
    test(s"random graph seed=$seed: Spark enumeration equals driver reference (with mts)") {
      val g = TestGraphs.random(seed)
      assert(sparkTris(g) == driverTris(g))
    }
  }

  test("running example: Spark and driver agree") {
    assert(sparkTris(TestGraphs.running) == driverTris(TestGraphs.running))
  }

  test("oracle: triangle-with-mts result matches DuckDB SQL over exploded temporal edges") {
    val g = TestGraphs.random(11, nV = 12, pEdge = 0.4)
    val te = TemporalGraph.toDF(spark, g)
    val edges = TemporalGraph.toGroupedDF(spark, g)
    val sparkDf = TriangleEnum.triangles(edges)
      .select(col("a"), col("b"), col("c"), col("mts"))
    val sql =
      """SELECT e1.src AS a, e1.dst AS b, e2.dst AS c,
        |       min(greatest(CAST(e1.t AS INT), CAST(e2.t AS INT), CAST(e3.t AS INT)) -
        |           least(CAST(e1.t AS INT), CAST(e2.t AS INT), CAST(e3.t AS INT))) AS mts
        |FROM te e1
        |JOIN te e2 ON e1.dst = e2.src
        |JOIN te e3 ON e1.src = e3.src AND e2.dst = e3.dst
        |GROUP BY e1.src, e1.dst, e2.dst
        |""".stripMargin
    Oracle.assertEquivalent(sparkDf, sql, "te" -> te)
  }

  test("oracle: static triangle count matches DuckDB") {
    val g = TestGraphs.random(12, nV = 14, pEdge = 0.45)
    val edges = TemporalGraph.toGroupedDF(spark, g)
    val sparkDf = TriangleEnum.triangles(edges).agg(count(lit(1)).as("tri_cnt"))
    val sql =
      """SELECT count(*) AS tri_cnt
        |FROM e e1 JOIN e e2 ON e1.dst = e2.src
        |JOIN e e3 ON e1.src = e3.src AND e2.dst = e3.dst""".stripMargin
    Oracle.assertEquivalent(sparkDf, sql,
      "e" -> edges.select(col("src"), col("dst")))
  }

  for (seed <- Seq(3, 7)) {
    test(s"graphx cross-check seed=$seed: vertex triangle counts sum to 3·|Δ|") {
      val g = TestGraphs.random(seed, nV = 16, pEdge = 0.4)
      val expect = DriverTriangles.enumerate(g).size.toLong
      assert(GraphXCheck.totalTriangles(spark, g) == expect)
    }
  }

  test("mts histogram covers every triangle exactly once") {
    val g = TestGraphs.random(21, nV = 16, pEdge = 0.4)
    val hist = TriangleEnum.mtsHistogram(TemporalGraph.toGroupedDF(spark, g)).collect()
    assert(hist.map(_.getLong(1)).sum == DriverTriangles.enumerate(g).size)
  }

  test("generator analog graph: spark triangle set builds a consistent TriangleSet") {
    val g = TemporalGraphGen.generate(
      TemporalGraphGen.GenCfgForTest.copy(seed = 5))
    val viaSpark = TriangleEnum.triangleSet(spark, g)
    val viaDriver = DriverTriangles.enumerate(g)
    assert(viaSpark.size == viaDriver.size)
    assert(viaSpark.tris.map(t => (t.e1, t.e2, t.e3, t.mts)).toSet ==
      viaDriver.tris.map(t => (t.e1, t.e2, t.e3, t.mts)).toSet)
  }
}
