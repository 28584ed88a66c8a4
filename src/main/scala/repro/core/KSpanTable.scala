package repro.core

/** The complete answer substrate of both indexes: for every edge `e` and
  * every `3 ≤ k ≤ trn(e)`, the k-span of Definition 5 — the smallest δ such
  * that the (k, δ)-truss contains `e`.
  *
  * Membership test: `e ∈ T_{k,δ}` iff `k ≤ 2` (the (2,δ)-truss is the whole
  * graph) or `trn(e) ≥ k ∧ kspan(e,k) ≤ δ`. TC-Index and DC-Index are two
  * losslessly-compressed serializations of this table.
  *
  * @param trn      static trussness of each edge (δ = δmax column)
  * @param spans    `spans(e)(k−3)` = k-span of `e`, defined for `k ≤ trn(e)`
  * @param deltaMax largest triangle mts of the graph
  */
final class KSpanTable(val trn: Array[Int], val spans: Array[Array[Int]], val deltaMax: Int) {
  val m: Int = trn.length
  val kMax: Int = if (m == 0) 2 else math.max(2, trn.max)

  def span(e: Int, k: Int): Int = spans(e)(k - 3)

  def inTruss(e: Int, k: Int, delta: Int): Boolean =
    k <= 2 || (trn(e) >= k && spans(e)(k - 3) <= delta)

  /** Edge set of `T_{k,δ}` straight from the table (reference for tests and
    * the source both index builders consume). Sorted ascending.
    */
  def trussEdges(k: Int, delta: Int): Array[Int] =
    (0 until m).filter(e => inTruss(e, k, delta)).toArray

  /** `Σ_{k,δ} |T_{k,δ}|` — the size of storing every truss explicitly; the
    * denominator of the paper's Table II compression ratio.
    */
  def totalTrussCells: Long = {
    var sum = 0L
    var e = 0
    while (e < m) {
      var k = 3
      while (k <= trn(e)) {
        // e appears in T_{k,δ} for every δ ∈ [kspan, δmax]
        sum += (deltaMax - spans(e)(k - 3) + 1).toLong
        k += 1
      }
      e += 1
    }
    sum
  }

  override def equals(o: Any): Boolean = o match {
    case other: KSpanTable =>
      deltaMax == other.deltaMax &&
        java.util.Arrays.equals(trn, other.trn) &&
        spans.length == other.spans.length &&
        spans.indices.forall(e => java.util.Arrays.equals(spans(e), other.spans(e)))
    case _ => false
  }
  override def hashCode(): Int = java.util.Arrays.hashCode(trn)
}
