package repro.triangles

import repro.tgraph.TemporalGraph

/** One triangle of the static graph, referenced by its three edge ids, with
  * its precomputed minimum time span. `e1 < e2 < e3` canonically.
  */
final case class Tri(e1: Int, e2: Int, e3: Int, mts: Int) {
  def edges: Array[Int] = Array(e1, e2, e3)
  def contains(e: Int): Boolean = e == e1 || e == e2 || e == e3
  /** The two edges other than `e` (which must be one of the three). */
  def others(e: Int): (Int, Int) =
    if (e == e1) (e2, e3) else if (e == e2) (e1, e3) else (e1, e2)
}

/** Minimal triangle-incidence interface shared by the immutable
  * [[TriangleSet]] and the mutable maintenance state, so the truss-insert
  * maintenance algorithm runs over either.
  */
trait TriangleAccess {
  /** Ids of triangles containing edge `e`. */
  def trianglesOf(e: Int): scala.collection.IndexedSeq[Int]
  /** The two edges of triangle `tid` other than `e`. */
  def othersOf(tid: Int, e: Int): (Int, Int)
}

/** The δ-triangle list of Definition 9, materialized once per graph: every
  * triangle with its mts, plus the two access paths every algorithm needs —
  * per-edge incidence lists and per-mts buckets.
  */
final class TriangleSet(val tris: Array[Tri], val m: Int) extends TriangleAccess {

  override def trianglesOf(e: Int): scala.collection.IndexedSeq[Int] =
    scala.collection.immutable.ArraySeq.unsafeWrapArray(byEdge(e))
  override def othersOf(tid: Int, e: Int): (Int, Int) = tris(tid).others(e)

  /** `byEdge(e)` = ids of triangles containing edge `e`. */
  val byEdge: Array[Array[Int]] = {
    val cnt = new Array[Int](m)
    tris.foreach { t => cnt(t.e1) += 1; cnt(t.e2) += 1; cnt(t.e3) += 1 }
    val out = Array.tabulate(m)(e => new Array[Int](cnt(e)))
    val fill = new Array[Int](m)
    var i = 0
    while (i < tris.length) {
      val t = tris(i)
      out(t.e1)(fill(t.e1)) = i; fill(t.e1) += 1
      out(t.e2)(fill(t.e2)) = i; fill(t.e2) += 1
      out(t.e3)(fill(t.e3)) = i; fill(t.e3) += 1
      i += 1
    }
    out
  }

  /** Largest minimum time span over all triangles (`δ_max`); 0 if none. */
  val deltaMax: Int = if (tris.isEmpty) 0 else tris.iterator.map(_.mts).max

  /** `byMts(δ)` = ids of triangles whose mts is exactly δ (Definition 9). */
  lazy val byMts: Array[Array[Int]] = {
    val cnt = new Array[Int](deltaMax + 1)
    tris.foreach(t => cnt(t.mts) += 1)
    val out = Array.tabulate(deltaMax + 1)(d => new Array[Int](cnt(d)))
    val fill = new Array[Int](deltaMax + 1)
    var i = 0
    while (i < tris.length) {
      val d = tris(i).mts
      out(d)(fill(d)) = i; fill(d) += 1
      i += 1
    }
    out
  }

  def size: Int = tris.length
}

/** Driver-side triangle enumeration — the sequential reference used by tests
  * and by the dynamic-maintenance state (the Spark enumerator in
  * [[TriangleEnum]] is the scalable path).
  */
object DriverTriangles {

  /** Enumerate all triangles `a < b < c` by sorted-adjacency intersection of
    * the endpoints of each edge `(a, b)`, keeping only common neighbors
    * `> b` so each triangle is emitted exactly once. mts is evaluated with
    * the three-pointer algorithm.
    */
  def enumerate(g: TemporalGraph): TriangleSet = {
    val buf = scala.collection.mutable.ArrayBuffer.empty[Tri]
    var eid = 0
    while (eid < g.m) {
      val e = g.edges(eid)
      val au = g.adj(e.u); val av = g.adj(e.v)
      var i = 0; var j = 0
      while (i < au.length && j < av.length) {
        val nu = g.nbrOf(au(i)); val nv = g.nbrOf(av(j))
        if (nu < nv) i += 1
        else if (nu > nv) j += 1
        else {
          if (nu > e.v) { // common neighbor w with a < b < w
            val euw = g.eidOf(au(i)); val evw = g.eidOf(av(j))
            val mts = Mts.of(e.ts, g.edges(euw).ts, g.edges(evw).ts)
            val ids = Array(eid, euw, evw).sorted
            buf += Tri(ids(0), ids(1), ids(2), mts)
          }
          i += 1; j += 1
        }
      }
      eid += 1
    }
    new TriangleSet(buf.toArray, g.m)
  }
}
