package repro.matrix

import org.scalatest.funsuite.AnyFunSuite

class CanonSpec extends AnyFunSuite {
  import MatrixTestUtil._

  test("canonQr flips negative R diagonal entries without changing Q*R") {
    val a = rnd(5, 3, 1)
    val (q0, r0) = Kernels.qr(a)
    // un-canonicalise by flipping a column/row pair
    val q = q0.copy(); val r = r0.copy()
    (0 until 3).foreach { c => r.cols(c)(1) = -r.cols(c)(1) }
    q.cols(1) = q.cols(1).map(-_)
    val (q1, r1) = Canon.canonQr(q, r)
    assert((0 until 3).forall(j => r1(j, j) >= 0))
    assertClose(Kernels.mmu(q1, r1), a, 1e-8)
    assertClose(q1, q0, 1e-12); assertClose(r1, r0, 1e-12)
  }

  test("canonSvd sorts singular values descending") {
    val u = ColMatrix.identity(3)
    val v = ColMatrix.identity(3)
    val (_, s, _) = Canon.canonSvd(u, Array(1.0, 3.0, 2.0), v)
    assert(s.toSeq == Seq(3.0, 2.0, 1.0))
  }

  test("canonSvd keeps U*diag(s)*V^T invariant under sign flips") {
    val a = rnd(6, 3, 5)
    val (u, s, v) = Kernels.svd(a)
    val uf = u.copy(); val vf = v.copy()
    uf.cols(0) = uf.cols(0).map(-_); vf.cols(0) = vf.cols(0).map(-_)
    val (u2, s2, v2) = Canon.canonSvd(uf, s.clone(), vf)
    assertClose(u2, u, 1e-12); assertClose(v2, v, 1e-12)
    assertCloseArr(s2, s, 0.0)
  }

  test("canonEig sorts eigenvalues descending and fixes signs") {
    val vecs = ColMatrix.fromRows(Seq(Seq(-1.0, 0.0), Seq(0.0, 1.0)))
    val (w, m) = Canon.canonEig(Array(1.0, 2.0), vecs)
    assert(w.toSeq == Seq(2.0, 1.0))
    assert(m(1, 0) == 1.0 && m(0, 1) == 1.0) // reordered and sign-flipped
  }

  test("canonical forms are idempotent") {
    val a = rnd(5, 3, 9)
    val (q, r) = Kernels.qr(a)
    val (q2, r2) = Canon.canonQr(q.copy(), r.copy())
    assertClose(q2, q, 0.0); assertClose(r2, r, 0.0)
    val (u, s, v) = Kernels.svd(a)
    val (u2, s2, v2) = Canon.canonSvd(u.copy(), s.clone(), v.copy())
    assertClose(u2, u, 0.0); assertClose(v2, v, 0.0); assertCloseArr(s2, s, 0.0)
  }
}
