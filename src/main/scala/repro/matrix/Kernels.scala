package repro.matrix

/** From-scratch matrix kernels over column-major [[ColMatrix]] values.
  *
  * These are the reproduction of the paper's "no-copy" BAT kernels
  * (Section 7.3): every algorithm is phrased as vectorised operations over
  * whole columns — the direct analog of MonetDB BAT operations — with
  * element accesses (`sel` in the paper) kept to a minimum.
  *
  *  - [[inv]] is the column-operation Gauss-Jordan elimination of paper
  *    Algorithm 2, extended with column pivoting for numerical robustness.
  *  - [[qr]] is modified Gram-Schmidt over columns, the paper's BAT baseline
  *    for QR (Gander's report, cited as [12] in the paper).
  *  - [[svd]] is one-sided Jacobi (column-pair rotations — inherently
  *    columnar), [[eigSym]] is cyclic Jacobi for symmetric matrices.
  *
  * All kernels are pure: inputs are never mutated.
  */
object Kernels {

  private val Eps = 2.220446049250313e-16 // IEEE-754 double machine epsilon

  // ---------------------------------------------------------------------
  // Element-wise and multiplicative ops (shape checks live in the callers
  // for relation-level messages; these require well-formed shapes).
  // ---------------------------------------------------------------------

  private def zipCols(a: ColMatrix, b: ColMatrix, f: (Double, Double) => Double): ColMatrix = {
    require(a.nRows == b.nRows && a.nCols == b.nCols,
      s"shape mismatch: ${a.nRows}x${a.nCols} vs ${b.nRows}x${b.nCols}")
    val out = Array.ofDim[Array[Double]](a.nCols)
    var j = 0
    while (j < a.nCols) {
      val ca = a.cols(j); val cb = b.cols(j)
      val c = new Array[Double](a.nRows)
      var i = 0
      while (i < a.nRows) { c(i) = f(ca(i), cb(i)); i += 1 }
      out(j) = c
      j += 1
    }
    new ColMatrix(out, a.nRows)
  }

  /** Element-wise addition (ADD). */
  def add(a: ColMatrix, b: ColMatrix): ColMatrix = zipCols(a, b, _ + _)

  /** Element-wise subtraction (SUB). */
  def sub(a: ColMatrix, b: ColMatrix): ColMatrix = zipCols(a, b, _ - _)

  /** Element-wise (Hadamard) multiplication (EMU). */
  def emu(a: ColMatrix, b: ColMatrix): ColMatrix = zipCols(a, b, _ * _)

  /** Matrix multiplication (MMU): (n x k) * (k x m) -> n x m.
    * Column j of the result is a sum of AXPY column updates — pure column ops.
    */
  def mmu(a: ColMatrix, b: ColMatrix): ColMatrix = {
    require(a.nCols == b.nRows,
      s"mmu: inner dimensions differ (${a.nCols} vs ${b.nRows})")
    val out = Array.ofDim[Array[Double]](b.nCols)
    var j = 0
    while (j < b.nCols) {
      val c = new Array[Double](a.nRows)
      val bj = b.cols(j)
      var l = 0
      while (l < a.nCols) {
        val al = a.cols(l); val w = bj(l)
        if (w != 0.0) {
          var i = 0
          while (i < a.nRows) { c(i) += al(i) * w; i += 1 }
        }
        l += 1
      }
      out(j) = c
      j += 1
    }
    new ColMatrix(out, a.nRows)
  }

  /** Transpose (TRA). */
  def tra(a: ColMatrix): ColMatrix = a.transpose

  /** Cross product (CPD): aT * b, computed as pairwise column dot products. */
  def cpd(a: ColMatrix, b: ColMatrix): ColMatrix = {
    require(a.nRows == b.nRows,
      s"cpd: row counts differ (${a.nRows} vs ${b.nRows})")
    val out = Array.ofDim[Array[Double]](b.nCols)
    var j = 0
    while (j < b.nCols) {
      val c = new Array[Double](a.nCols)
      val bj = b.cols(j)
      var i = 0
      while (i < a.nCols) { c(i) = dot(a.cols(i), bj); i += 1 }
      out(j) = c
      j += 1
    }
    new ColMatrix(out, a.nCols)
  }

  /** Outer product (OPD): a * bT for a: n1 x k, b: n2 x k -> n1 x n2. */
  def opd(a: ColMatrix, b: ColMatrix): ColMatrix = {
    require(a.nCols == b.nCols,
      s"opd: column counts differ (${a.nCols} vs ${b.nCols})")
    val out = Array.ofDim[Array[Double]](b.nRows)
    var j = 0
    while (j < b.nRows) {
      val c = new Array[Double](a.nRows)
      var l = 0
      while (l < a.nCols) {
        val al = a.cols(l); val w = b.cols(l)(j)
        if (w != 0.0) {
          var i = 0
          while (i < a.nRows) { c(i) += al(i) * w; i += 1 }
        }
        l += 1
      }
      out(j) = c
      j += 1
    }
    new ColMatrix(out, a.nRows)
  }

  private def dot(x: Array[Double], y: Array[Double]): Double = {
    var s = 0.0
    var i = 0
    while (i < x.length) { s += x(i) * y(i); i += 1 }
    s
  }

  private def norm2(x: Array[Double]): Double = math.sqrt(dot(x, x))

  // ---------------------------------------------------------------------
  // Inversion — paper Algorithm 2 (column-op Gauss-Jordan) + column pivoting.
  // ---------------------------------------------------------------------

  /** Matrix inversion via Gauss-Jordan elimination expressed as column
    * operations (paper Algorithm 2). Each elementary step is a whole-column
    * scale or AXPY, i.e. a right-multiplication `A <- A * E`; after `A` is
    * reduced to the identity, the accumulated product applied to an identity
    * matrix is exactly `A^-1`. Column pivoting (a column swap, also a
    * right-multiplication) is added for robustness; the paper's algorithm
    * assumes nonzero pivots.
    */
  def inv(a: ColMatrix): ColMatrix = {
    val n = a.nRows
    require(a.nCols == n, s"inv: matrix must be square, got ${n}x${a.nCols}")
    val b = a.copy()
    val br = ColMatrix.identity(n)
    var i = 0
    while (i < n) {
      // Column pivot: bring the largest |row-i| entry among columns >= i to i.
      var p = i
      var best = math.abs(b.cols(i)(i))
      var j = i + 1
      while (j < n) {
        val v = math.abs(b.cols(j)(i))
        if (v > best) { best = v; p = j }
        j += 1
      }
      require(best > 0.0, "inv: matrix is singular")
      if (p != i) {
        val t = b.cols(i); b.cols(i) = b.cols(p); b.cols(p) = t
        val u = br.cols(i); br.cols(i) = br.cols(p); br.cols(p) = u
      }
      val v1 = b.cols(i)(i)              // sel(B_i, i)
      scaleInPlace(b.cols(i), 1.0 / v1)  // B_i <- B_i / v1
      scaleInPlace(br.cols(i), 1.0 / v1) // BR_i <- BR_i / v1
      j = 0
      while (j < n) {
        if (j != i) {
          val v2 = b.cols(j)(i)          // sel(B_j, i)
          if (v2 != 0.0) {
            axpyInPlace(b.cols(j), b.cols(i), -v2)   // B_j <- B_j - B_i * v2
            axpyInPlace(br.cols(j), br.cols(i), -v2) // BR_j <- BR_j - BR_i * v2
          }
        }
        j += 1
      }
      i += 1
    }
    br
  }

  private def scaleInPlace(x: Array[Double], s: Double): Unit = {
    var i = 0
    while (i < x.length) { x(i) *= s; i += 1 }
  }

  private def axpyInPlace(y: Array[Double], x: Array[Double], alpha: Double): Unit = {
    var i = 0
    while (i < y.length) { y(i) += alpha * x(i); i += 1 }
  }

  // ---------------------------------------------------------------------
  // QR — modified Gram-Schmidt over columns (the paper's BAT baseline [12]).
  // ---------------------------------------------------------------------

  /** Thin QR decomposition via modified Gram-Schmidt: `a = Q * R` with
    * Q: n x k orthonormal columns and R: k x k upper triangular. Requires
    * n >= k and full column rank. Canonicalised so that diag(R) >= 0.
    */
  def qr(a: ColMatrix): (ColMatrix, ColMatrix) = {
    val n = a.nRows; val k = a.nCols
    require(n >= k, s"qr: need rows >= cols, got ${n}x$k")
    val q = a.copy()
    val r = ColMatrix.zeros(k, k)
    var j = 0
    while (j < k) {
      val qj = q.cols(j)
      var i = 0
      while (i < j) {
        val rij = dot(q.cols(i), qj)
        r.cols(j)(i) = rij
        axpyInPlace(qj, q.cols(i), -rij)
        i += 1
      }
      val nrm = norm2(qj)
      require(nrm > math.max(n, k) * Eps * 1e3 * (1.0 + colAbsMax(a, j)),
        s"qr: column $j is linearly dependent (rank-deficient input)")
      r.cols(j)(j) = nrm
      scaleInPlace(qj, 1.0 / nrm)
      j += 1
    }
    Canon.canonQr(q, r)
  }

  private def colAbsMax(a: ColMatrix, j: Int): Double = {
    var m = 0.0
    val c = a.cols(j)
    var i = 0
    while (i < c.length) { m = math.max(m, math.abs(c(i))); i += 1 }
    m
  }

  // ---------------------------------------------------------------------
  // Cholesky — column version, upper R with A = R^T R (R's chol convention).
  // ---------------------------------------------------------------------

  /** Cholesky factorisation of a symmetric positive-definite matrix.
    * Returns upper-triangular `R` such that `a = R^T * R`.
    */
  def chol(a: ColMatrix): ColMatrix = {
    val n = a.nRows
    require(a.nCols == n, s"chol: matrix must be square, got ${n}x${a.nCols}")
    require(isSymmetric(a), "chol: matrix must be symmetric")
    val r = ColMatrix.zeros(n, n)
    var j = 0
    while (j < n) {
      var i = 0
      while (i <= j) {
        var s = a(i, j)
        var l = 0
        while (l < i) { s -= r.cols(i)(l) * r.cols(j)(l); l += 1 }
        if (i == j) {
          require(s > 0.0, "chol: matrix is not positive definite")
          r.cols(j)(j) = math.sqrt(s)
        } else {
          r.cols(j)(i) = s / r.cols(i)(i)
        }
        i += 1
      }
      j += 1
    }
    r
  }

  def isSymmetric(a: ColMatrix, tol: Double = 1e-9): Boolean = {
    if (a.nRows != a.nCols) return false
    val scale = 1.0 + (0 until a.nCols).map(colAbsMax(a, _)).foldLeft(0.0)(math.max)
    var j = 0
    while (j < a.nCols) {
      var i = 0
      while (i < j) {
        if (math.abs(a(i, j) - a(j, i)) > tol * scale) return false
        i += 1
      }
      j += 1
    }
    true
  }

  // ---------------------------------------------------------------------
  // Determinant — Gaussian elimination with partial pivoting.
  // ---------------------------------------------------------------------

  /** Determinant via LU (Gaussian elimination, partial pivoting). */
  def det(a: ColMatrix): Double = {
    val n = a.nRows
    require(a.nCols == n, s"det: matrix must be square, got ${n}x${a.nCols}")
    val m = a.toRowArrays
    var d = 1.0
    var i = 0
    while (i < n) {
      var p = i
      var best = math.abs(m(i)(i))
      var r = i + 1
      while (r < n) {
        if (math.abs(m(r)(i)) > best) { best = math.abs(m(r)(i)); p = r }
        r += 1
      }
      if (best == 0.0) return 0.0
      if (p != i) { val t = m(i); m(i) = m(p); m(p) = t; d = -d }
      d *= m(i)(i)
      r = i + 1
      while (r < n) {
        val f = m(r)(i) / m(i)(i)
        if (f != 0.0) {
          var c = i
          while (c < n) { m(r)(c) -= f * m(i)(c); c += 1 }
        }
        r += 1
      }
      i += 1
    }
    d
  }

  // ---------------------------------------------------------------------
  // Symmetric eigen decomposition — cyclic Jacobi rotations.
  // ---------------------------------------------------------------------

  /** Eigen decomposition of a symmetric matrix via cyclic Jacobi rotations.
    * Returns (eigenvalues, eigenvector matrix) in canonical form (descending
    * eigenvalues; each vector's max-|.| component positive). Each rotation
    * touches two rows and two columns — a column-pair operation.
    */
  def eigSym(a: ColMatrix): (Array[Double], ColMatrix) = {
    val n = a.nRows
    require(a.nCols == n, s"eig: matrix must be square, got ${n}x${a.nCols}")
    require(isSymmetric(a), "eig: only symmetric matrices are supported (see DESIGN.md)")
    val m = a.toRowArrays
    val v = ColMatrix.identity(n).toRowArrays
    val maxSweeps = 64
    var sweep = 0
    var off = offDiagNorm(m)
    val scale = frobenius(m) + Eps
    while (off > 1e-14 * scale && sweep < maxSweeps) {
      var p = 0
      while (p < n - 1) {
        var q = p + 1
        while (q < n) {
          val apq = m(p)(q)
          if (math.abs(apq) > 1e-300) {
            val app = m(p)(p); val aqq = m(q)(q)
            val theta = (aqq - app) / (2.0 * apq)
            val t =
              if (theta >= 0) 1.0 / (theta + math.sqrt(1.0 + theta * theta))
              else 1.0 / (theta - math.sqrt(1.0 + theta * theta))
            val c = 1.0 / math.sqrt(1.0 + t * t)
            val s = t * c
            var i = 0
            while (i < n) {
              val mip = m(i)(p); val miq = m(i)(q)
              m(i)(p) = c * mip - s * miq
              m(i)(q) = s * mip + c * miq
              i += 1
            }
            i = 0
            while (i < n) {
              val mpi = m(p)(i); val mqi = m(q)(i)
              m(p)(i) = c * mpi - s * mqi
              m(q)(i) = s * mpi + c * mqi
              val vip = v(i)(p); val viq = v(i)(q)
              v(i)(p) = c * vip - s * viq
              v(i)(q) = s * vip + c * viq
              i += 1
            }
          }
          q += 1
        }
        p += 1
      }
      off = offDiagNorm(m)
      sweep += 1
    }
    val values = Array.tabulate(n)(i => m(i)(i))
    val vectors = ColMatrix.fromRows(v.toIndexedSeq.map(_.toIndexedSeq))
    Canon.canonEig(values, vectors)
  }

  private def offDiagNorm(m: Array[Array[Double]]): Double = {
    var s = 0.0
    var i = 0
    while (i < m.length) {
      var j = 0
      while (j < m.length) {
        if (i != j) s += m(i)(j) * m(i)(j)
        j += 1
      }
      i += 1
    }
    math.sqrt(s)
  }

  private def frobenius(m: Array[Array[Double]]): Double = {
    var s = 0.0
    var i = 0
    while (i < m.length) {
      var j = 0
      while (j < m(i).length) { s += m(i)(j) * m(i)(j); j += 1 }
      i += 1
    }
    math.sqrt(s)
  }

  // ---------------------------------------------------------------------
  // SVD — one-sided Jacobi (column-pair rotations on A, accumulate V).
  // ---------------------------------------------------------------------

  /** Thin SVD `a = U * diag(s) * V^T` via one-sided Jacobi.
    * For n >= k returns (U: n x k, s: length k descending, V: k x k).
    * For n < k the decomposition of the transpose is used and factors are
    * swapped. Canonical sign convention via [[Canon.canonSvd]].
    */
  def svd(a: ColMatrix): (ColMatrix, Array[Double], ColMatrix) = {
    if (a.nRows < a.nCols) {
      val (u, s, v) = svdTall(a.transpose)
      (v, s, u)
    } else svdTall(a)
  }

  private def svdTall(a: ColMatrix): (ColMatrix, Array[Double], ColMatrix) = {
    val n = a.nRows; val k = a.nCols
    val u = a.copy()
    val v = ColMatrix.identity(k)
    val maxSweeps = 96
    var rotated = true
    var sweep = 0
    while (rotated && sweep < maxSweeps) {
      rotated = false
      var p = 0
      while (p < k - 1) {
        var q = p + 1
        while (q < k) {
          val cp = u.cols(p); val cq = u.cols(q)
          val alpha = dot(cp, cp); val beta = dot(cq, cq); val gamma = dot(cp, cq)
          if (math.abs(gamma) > Eps * math.sqrt(alpha * beta) && gamma != 0.0) {
            rotated = true
            val zeta = (beta - alpha) / (2.0 * gamma)
            val t =
              if (zeta >= 0) 1.0 / (zeta + math.sqrt(1.0 + zeta * zeta))
              else 1.0 / (zeta - math.sqrt(1.0 + zeta * zeta))
            val c = 1.0 / math.sqrt(1.0 + t * t)
            val s = t * c
            rotateCols(cp, cq, c, s)
            rotateCols(v.cols(p), v.cols(q), c, s)
          }
          q += 1
        }
        p += 1
      }
      sweep += 1
    }
    val sigma = Array.tabulate(k)(j => norm2(u.cols(j)))
    val maxSigma = sigma.foldLeft(0.0)(math.max)
    val tol = math.max(n, k) * Eps * math.max(maxSigma, 1e-300)
    var j = 0
    while (j < k) {
      if (sigma(j) > tol) scaleInPlace(u.cols(j), 1.0 / sigma(j))
      else { sigma(j) = 0.0; java.util.Arrays.fill(u.cols(j), 0.0) }
      j += 1
    }
    // Zero-sigma U columns are replaced by an orthonormal completion so U
    // keeps orthonormal columns even for rank-deficient input.
    fillZeroColumns(u)
    Canon.canonSvd(u, sigma, v)
  }

  private def rotateCols(x: Array[Double], y: Array[Double], c: Double, s: Double): Unit = {
    var i = 0
    while (i < x.length) {
      val xi = x(i); val yi = y(i)
      x(i) = c * xi - s * yi
      y(i) = s * xi + c * yi
      i += 1
    }
  }

  private def fillZeroColumns(u: ColMatrix): Unit = {
    val zeroIdx = (0 until u.nCols).filter(j => norm2(u.cols(j)) == 0.0)
    if (zeroIdx.isEmpty) return
    val basis = completeBasis(u, keepCols = (0 until u.nCols).filterNot(zeroIdx.contains))
    var b = 0
    zeroIdx.foreach { j =>
      u.cols(j) = basis(b); b += 1
    }
  }

  /** Orthonormal columns extending `keepCols` of `u` to a larger basis;
    * returns the newly added columns (Gram-Schmidt against the kept ones,
    * candidates drawn from the standard basis).
    */
  private def completeBasis(u: ColMatrix, keepCols: Seq[Int]): Array[Array[Double]] = {
    val n = u.nRows
    val existing = scala.collection.mutable.ArrayBuffer[Array[Double]]()
    keepCols.foreach(j => existing += u.cols(j))
    val added = scala.collection.mutable.ArrayBuffer[Array[Double]]()
    var e = 0
    while (e < n && existing.length < n) {
      val cand = new Array[Double](n); cand(e) = 1.0
      existing.foreach(q => axpyInPlace(cand, q, -dot(q, cand)))
      val nrm = norm2(cand)
      if (nrm > 1e-8) {
        scaleInPlace(cand, 1.0 / nrm)
        existing += cand
        added += cand
      }
      e += 1
    }
    require(existing.length == n, "completeBasis: failed to complete basis")
    added.toArray
  }

  /** Full (square) left factor of the SVD: thin U completed to n x n. */
  def svdFullU(a: ColMatrix): ColMatrix = {
    val (uThin, _, _) = svd(a)
    completeToSquare(uThin)
  }

  /** Complete a matrix with orthonormal columns to a square orthonormal
    * matrix (deterministic Gram-Schmidt against the standard basis). Shared
    * by both backends so `usv` results are backend-independent.
    */
  def completeToSquare(uThin: ColMatrix): ColMatrix = {
    if (uThin.nCols == uThin.nRows) uThin
    else {
      val extra = completeBasis(uThin, uThin.cols.indices)
      new ColMatrix(uThin.cols ++ extra, uThin.nRows)
    }
  }

  /** Numerical rank: number of singular values above the standard
    * `max(n,k) * eps * sigma_max` threshold.
    */
  def rank(a: ColMatrix): Int = {
    if (a.nRows == 0 || a.nCols == 0) return 0
    val (_, s, _) = svd(a)
    val tol = math.max(a.nRows, a.nCols) * Eps * s.foldLeft(0.0)(math.max)
    s.count(_ > tol)
  }

  // ---------------------------------------------------------------------
  // Solve — exact for square systems, least squares for rectangular (via QR).
  // ---------------------------------------------------------------------

  /** Solve `a * x = b` (least squares when `a` is rectangular, like R's
    * `qr.solve`). `b` may have several columns; x is (a.nCols x b.nCols).
    */
  def solve(a: ColMatrix, b: ColMatrix): ColMatrix = {
    require(a.nRows == b.nRows,
      s"solve: row counts differ (${a.nRows} vs ${b.nRows})")
    val (q, r) = qr(a)
    val qtb = cpd(q, b) // Q^T b, k x bCols
    val k = a.nCols
    val out = Array.ofDim[Array[Double]](b.nCols)
    var j = 0
    while (j < b.nCols) {
      val y = qtb.cols(j)
      val x = new Array[Double](k)
      var i = k - 1
      while (i >= 0) {
        var s = y(i)
        var l = i + 1
        while (l < k) { s -= r.cols(l)(i) * x(l); l += 1 }
        x(i) = s / r.cols(i)(i)
        i -= 1
      }
      out(j) = x
      j += 1
    }
    new ColMatrix(out, k)
  }
}
