package repro.matrix

/** Canonical forms for decompositions whose factors are only unique up to
  * signs and ordering. Both backends (columnar and Breeze) run their results
  * through these, so backend-agreement tests and re-runs are deterministic,
  * and relational results do not depend on the physical algorithm — the
  * relational matrix algebra stays implementation-independent (paper goal 2).
  */
object Canon {

  /** QR: flip signs so that diag(R) >= 0 (then Q*R is unchanged). */
  def canonQr(q: ColMatrix, r: ColMatrix): (ColMatrix, ColMatrix) = {
    val k = r.nCols
    var j = 0
    while (j < k) {
      if (r.cols(j)(j) < 0.0) {
        // negate row j of R and column j of Q
        var c = 0
        while (c < k) { r.cols(c)(j) = -r.cols(c)(j); c += 1 }
        negate(q.cols(j))
      }
      j += 1
    }
    (q, r)
  }

  /** SVD: descending singular values; the max-|.| component of each U column
    * positive (V flipped to match, so U * diag(s) * V^T is unchanged).
    */
  def canonSvd(u: ColMatrix, s: Array[Double], v: ColMatrix): (ColMatrix, Array[Double], ColMatrix) = {
    val order = s.indices.sortBy(i => -s(i))
    val u2 = new ColMatrix(order.map(u.cols).toArray, u.nRows)
    val v2 = new ColMatrix(order.map(v.cols).toArray, v.nRows)
    val s2 = order.map(s).toArray
    var j = 0
    while (j < s2.length) {
      if (maxAbsIsNegative(u2.cols(j))) { negate(u2.cols(j)); negate(v2.cols(j)) }
      j += 1
    }
    (u2, s2, v2)
  }

  /** Symmetric eigen: descending eigenvalues; max-|.| component of each
    * eigenvector positive.
    */
  def canonEig(values: Array[Double], vectors: ColMatrix): (Array[Double], ColMatrix) = {
    val order = values.indices.sortBy(i => -values(i))
    val w = order.map(values).toArray
    val m = new ColMatrix(order.map(vectors.cols).toArray, vectors.nRows)
    var j = 0
    while (j < w.length) {
      if (maxAbsIsNegative(m.cols(j))) negate(m.cols(j))
      j += 1
    }
    (w, m)
  }

  private def maxAbsIsNegative(c: Array[Double]): Boolean = {
    var best = 0.0
    var bestIdx = -1
    var i = 0
    while (i < c.length) {
      if (math.abs(c(i)) > best) { best = math.abs(c(i)); bestIdx = i }
      i += 1
    }
    bestIdx >= 0 && c(bestIdx) < 0.0
  }

  private def negate(c: Array[Double]): Unit = {
    var i = 0
    while (i < c.length) { c(i) = -c(i); i += 1 }
  }
}
