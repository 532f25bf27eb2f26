package repro.matrix

import scala.util.Random

/** Deterministic random matrices and approximate assertions for kernel tests. */
object MatrixTestUtil {

  def rnd(n: Int, k: Int, seed: Long, scale: Double = 1.0): ColMatrix = {
    val r = new Random(seed)
    new ColMatrix(Array.fill(k)(Array.fill(n)((r.nextDouble() * 2 - 1) * scale)), n)
  }

  /** Random well-conditioned nonsingular matrix: random + n*I. */
  def rndNonsingular(n: Int, seed: Long): ColMatrix = {
    val a = rnd(n, n, seed)
    var i = 0
    while (i < n) { a.cols(i)(i) += n.toDouble; i += 1 }
    a
  }

  /** Random symmetric matrix. */
  def rndSym(n: Int, seed: Long): ColMatrix = {
    val a = rnd(n, n, seed)
    val s = ColMatrix.zeros(n, n)
    var i = 0
    while (i < n) {
      var j = 0
      while (j < n) { s.cols(j)(i) = (a(i, j) + a(j, i)) / 2; j += 1 }
      i += 1
    }
    s
  }

  /** Random symmetric positive definite matrix: B^T B + I. */
  def rndSpd(n: Int, seed: Long): ColMatrix = {
    val b = rnd(n, n, seed)
    val s = Kernels.cpd(b, b)
    var i = 0
    while (i < n) { s.cols(i)(i) += 1.0; i += 1 }
    s
  }

  def assertClose(a: ColMatrix, b: ColMatrix, tol: Double = 1e-8, msg: String = ""): Unit = {
    val d = a.maxAbsDiff(b)
    assert(d <= tol, s"$msg max abs diff $d > $tol\n a=$a\n b=$b")
  }

  def assertCloseArr(a: Array[Double], b: Array[Double], tol: Double = 1e-8): Unit = {
    assert(a.length == b.length, s"length ${a.length} vs ${b.length}")
    a.zip(b).zipWithIndex.foreach { case ((x, y), i) =>
      assert(math.abs(x - y) <= tol, s"element $i: $x vs $y")
    }
  }

  def isOrthonormalCols(m: ColMatrix, tol: Double = 1e-8): Boolean =
    Kernels.cpd(m, m).maxAbsDiff(ColMatrix.identity(m.nCols)) <= tol

  def isUpperTriangular(m: ColMatrix, tol: Double = 1e-10): Boolean = {
    var ok = true
    var j = 0
    while (j < m.nCols) {
      var i = j + 1
      while (i < m.nRows) { if (math.abs(m(i, j)) > tol) ok = false; i += 1 }
      j += 1
    }
    ok
  }
}
