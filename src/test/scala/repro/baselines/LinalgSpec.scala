package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.storage.CooMat
import Linalg._

class LinalgSpec extends AnyFunSuite {

  private val a = CooMat.random(15, 12, 40, seed = 1)
  private val b = CooMat.random(12, 9, 30, seed = 2)

  private def denseOf(c: CSR): Array[Double] = {
    val out = new Array[Double](c.rows * c.cols)
    c.toCoo.foreach { case (i, j, v) => out(i * c.cols + j) = v }
    out
  }

  test("CSR.from round-trips the COO entries") {
    val csr = CSR.from(a)
    assert(csr.toCoo.sortBy(e => (e._1, e._2)) == a.entries.toSeq)
  }

  test("DenseMat.from matches entries") {
    val d = DenseMat.from(a)
    a.entries.foreach { case (i, j, v) => assert(d(i, j) == v) }
    assert(d.a.count(_ != 0.0) == a.nnz)
  }

  test("sparse mm equals dense mm") {
    val sp = CSR.from(a).mm(CSR.from(b))
    val dn = DenseMat.from(a).mm(DenseMat.from(b))
    assert(denseOf(sp).zip(dn.a).forall { case (x, y) => math.abs(x - y) < 1e-9 })
  }

  test("sparse-dense mm equals dense mm") {
    val sd = CSR.from(a).mmDense(DenseMat.from(b))
    val dn = DenseMat.from(a).mm(DenseMat.from(b))
    assert(sd.a.zip(dn.a).forall { case (x, y) => math.abs(x - y) < 1e-9 })
  }

  test("mv equals dense mv") {
    val x = Array.tabulate(12)(i => 0.25 * i - 1)
    val s = CSR.from(a).mv(x)
    val d = DenseMat.from(a).mv(x)
    assert(s.zip(d).forall { case (p, q) => math.abs(p - q) < 1e-9 })
  }

  test("transpose round-trips") {
    val t = CSR.from(a).transpose
    assert(t.rows == a.n && t.cols == a.m)
    assert(t.toCoo.map { case (i, j, v) => (j, i, v) }.sortBy(e => (e._1, e._2))
      == a.entries.toSeq)
    val dt = DenseMat.from(a).transpose
    a.entries.foreach { case (i, j, v) => assert(dt(j, i) == v) }
  }

  test("sumAll agrees between representations") {
    val s = a.entries.map(_._3).sum
    assert(math.abs(CSR.from(a).sumAll - s) < 1e-9)
    assert(math.abs(DenseMat.from(a).sumAll - s) < 1e-9)
  }

  test("SciPyLike kernels match reference checksums") {
    val aCsr = CSR.from(a); val bCsr = CSR.from(b)
    assert(math.abs(Systems.SciPyLike.mmm(aCsr, bCsr) - Systems.Ref.mmm(a, b)) < 1e-6)
    assert(math.abs(Systems.SciPyLike.sumMmm(aCsr, bCsr) - Systems.Ref.sumMmm(a, b)) < 1e-6)
    val sq = CooMat.random(14, 14, 50, seed = 3)
    val x = Array.tabulate(14)(i => 0.5 + i * 0.01)
    val c = CSR.from(sq)
    assert(math.abs(Systems.SciPyLike.batax(1.5, c, c.transpose, x)
      - Systems.Ref.batax(1.5, sq, x)) < 1e-6)
  }

  test("NumPyLike kernels match reference checksums") {
    val aD = DenseMat.from(a); val bD = DenseMat.from(b)
    assert(math.abs(Systems.NumPyLike.mmm(aD, bD) - Systems.Ref.mmm(a, b)) < 1e-6)
    assert(math.abs(Systems.NumPyLike.sumMmm(aD, bD) - Systems.Ref.sumMmm(a, b)) < 1e-6)
  }

  test("TorchLike kernels match reference checksums") {
    val aCsr = CSR.from(a); val bD = DenseMat.from(b)
    assert(math.abs(Systems.TorchLike.mmm(aCsr, bD) - Systems.Ref.mmm(a, b)) < 1e-6)
    assert(math.abs(Systems.TorchLike.sumMmm(aCsr, bD) - Systems.Ref.sumMmm(a, b)) < 1e-6)
  }
}
