package repro.core

import repro.triangles.TriangleSet
import repro.truss.TrussDecomposition

/** Decomposition Based Algorithm (§V-A): constructs the full k-span table
  * (equivalently, every Horizontal IES of the (k,δ)-truss graph) by
  * decrementally decomposing `T_{k,δ}` from `δ = δmax` down to 0 for each k.
  *
  * For a fixed k it starts from the static k-truss (= `T_{k,δmax}`), then at
  * each step δ invalidates exactly the still-alive triangles with
  * `mts = δ` (the δ-triangle list makes this O(1) per triangle — triangles
  * with larger mts were invalidated in earlier steps, the paper's
  * de-duplication trick) and peels the edges whose δ-support drops below
  * `k−2`. An edge peeled during step δ belongs to `T_{k,δ}` but not
  * `T_{k,δ−1}`, i.e. its k-span is δ; survivors at δ = 0 have k-span 0.
  */
object DBA {

  def build(ts: TriangleSet): KSpanTable = {
    val m = ts.m
    val trn = TrussDecomposition.trussness(ts)
    val kMax = if (m == 0) 2 else math.max(2, trn.max)
    val spans = Array.tabulate(m)(e => Array.fill(math.max(0, trn(e) - 2))(-1))
    val dMax = ts.deltaMax

    var k = 3
    while (k <= kMax) {
      // T_{k,δmax} = static k-truss; triangles alive iff fully inside it
      val alive = Array.tabulate(m)(e => trn(e) >= k)
      val triAlive = new Array[Boolean](ts.size)
      val sup = new Array[Int](m)
      var i = 0
      while (i < ts.size) {
        val t = ts.tris(i)
        if (alive(t.e1) && alive(t.e2) && alive(t.e3)) {
          triAlive(i) = true
          sup(t.e1) += 1; sup(t.e2) += 1; sup(t.e3) += 1
        }
        i += 1
      }
      val queue = scala.collection.mutable.ArrayDeque.empty[Int]
      var delta = dMax
      while (delta >= 1) {
        val bucket = ts.byMts(delta)
        var bi = 0
        while (bi < bucket.length) {
          val tid = bucket(bi)
          if (triAlive(tid)) {
            triAlive(tid) = false
            val t = ts.tris(tid)
            sup(t.e1) -= 1; if (alive(t.e1) && sup(t.e1) < k - 2) queue += t.e1
            sup(t.e2) -= 1; if (alive(t.e2) && sup(t.e2) < k - 2) queue += t.e2
            sup(t.e3) -= 1; if (alive(t.e3) && sup(t.e3) < k - 2) queue += t.e3
          }
          bi += 1
        }
        while (queue.nonEmpty) {
          val e = queue.removeHead()
          if (alive(e) && sup(e) < k - 2) {
            alive(e) = false
            spans(e)(k - 3) = delta // H-IES between T_{k,δ} and T_{k,δ−1}
            val incident = ts.byEdge(e)
            var ti = 0
            while (ti < incident.length) {
              val tid = incident(ti)
              if (triAlive(tid)) {
                triAlive(tid) = false
                val (f1, f2) = ts.tris(tid).others(e)
                sup(f1) -= 1; if (alive(f1) && sup(f1) < k - 2) queue += f1
                sup(f2) -= 1; if (alive(f2) && sup(f2) < k - 2) queue += f2
              }
              ti += 1
            }
          }
        }
        delta -= 1
      }
      var e = 0
      while (e < m) { if (alive(e)) spans(e)(k - 3) = 0; e += 1 }
      k += 1
    }
    new KSpanTable(trn, spans, dMax)
  }
}
