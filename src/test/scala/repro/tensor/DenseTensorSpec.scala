package repro.tensor

import org.scalatest.funsuite.AnyFunSuite
import repro.linalg.DenseMatrix

class DenseTensorSpec extends AnyFunSuite {

  private def t234: DenseTensor = {
    val t = DenseTensor.zeros(Array(2, 3, 4))
    var v = 1.0
    DenseTensor.indices(t.dims).foreach { idx => t(idx) = v; v += 1 }
    t
  }

  test("offset is column-major (first index fastest)") {
    val t = DenseTensor.zeros(Array(2, 3, 4))
    assert(t.offset(Array(0, 0, 0)) == 0)
    assert(t.offset(Array(1, 0, 0)) == 1)
    assert(t.offset(Array(0, 1, 0)) == 2)
    assert(t.offset(Array(0, 0, 1)) == 6)
    assert(t.offset(Array(1, 2, 3)) == 1 + 2 * 2 + 3 * 6)
  }

  test("apply/update round-trip") {
    val t = DenseTensor.zeros(Array(3, 3))
    t(Array(2, 1)) = 7.5
    assert(t(Array(2, 1)) == 7.5)
  }

  test("indices enumerates all cells exactly once, column-major") {
    val all = DenseTensor.indices(Array(2, 3)).map(_.toSeq).toSeq
    assert(all == Seq(Seq(0, 0), Seq(1, 0), Seq(0, 1), Seq(1, 1), Seq(0, 2), Seq(1, 2)))
  }

  test("frobeniusNorm matches direct computation") {
    val t = t234
    val direct = math.sqrt(t.data.map(x => x * x).sum)
    assert(math.abs(t.frobeniusNorm - direct) < 1e-12)
  }

  test("matricize: every cell appears once, rows are the mode index") {
    val t = t234
    for (n <- 0 until 3) {
      val m = t.matricize(n)
      assert(m.rows == t.dims(n))
      assert(m.cols == t.data.length / t.dims(n))
      assert(math.abs(m.frobeniusNorm - t.frobeniusNorm) < 1e-12)
    }
  }

  test("matricize mode-0 of a 2x3 matrix is the matrix itself") {
    val t = DenseTensor.zeros(Array(2, 3))
    t(Array(0, 0)) = 1; t(Array(1, 0)) = 2; t(Array(0, 1)) = 3
    t(Array(1, 1)) = 4; t(Array(0, 2)) = 5; t(Array(1, 2)) = 6
    val m = t.matricize(0)
    assert(m(0, 0) == 1 && m(1, 0) == 2 && m(0, 1) == 3 && m(1, 2) == 6)
  }

  test("matricize column index follows Eq. (2)") {
    // Eq. (2) 0-based: j = sum_{k!=n} i_k * prod_{m<k, m!=n} I_m
    val t = t234
    val n = 1
    val m = t.matricize(n)
    DenseTensor.indices(t.dims).foreach { idx =>
      val j = {
        var acc = 0; var stride = 1
        for (k <- 0 until 3 if k != n) { acc += idx(k) * stride; stride *= t.dims(k) }
        acc
      }
      assert(m(idx(n), j) == t(idx))
    }
  }

  test("modeProduct against hand-computed 2x2x2 example") {
    val t = DenseTensor.zeros(Array(2, 2))
    t(Array(0, 0)) = 1; t(Array(1, 0)) = 2; t(Array(0, 1)) = 3; t(Array(1, 1)) = 4
    val u = DenseMatrix.fromRows(Array(Array(1.0, 1.0))) // 1x2: sums over mode 0
    val r = t.modeProduct(0, u)
    assert(r.dims.toSeq == Seq(1, 2))
    assert(r(Array(0, 0)) == 3.0 && r(Array(0, 1)) == 7.0)
  }

  test("modeProduct identity: (X ×_n U)_(n) = U · X_(n)") {
    val t = t234
    for (n <- 0 until 3) {
      val u = DenseMatrix.rand(5, t.dims(n), 10 + n)
      val left = t.modeProduct(n, u).matricize(n)
      val right = u * t.matricize(n)
      assert(left.maxAbsDiff(right) < 1e-10, s"mode $n")
    }
  }

  test("modeProduct on different modes commutes") {
    val t = t234
    val u0 = DenseMatrix.rand(2, 2, 1)
    val u2 = DenseMatrix.rand(3, 4, 2)
    val a = t.modeProduct(0, u0).modeProduct(2, u2)
    val b = t.modeProduct(2, u2).modeProduct(0, u0)
    assert(a.maxAbsDiff(b) < 1e-10)
  }

  test("fromEntries places values, leaves rest zero") {
    val t = DenseTensor.fromEntries(Array(3, 3),
      Seq((Array(0, 1), 2.0), (Array(2, 2), 5.0)))
    assert(t(Array(0, 1)) == 2.0 && t(Array(2, 2)) == 5.0 && t(Array(1, 1)) == 0.0)
  }

  test("MemoryGuard: oversized dense allocation raises SimulatedOom") {
    MemoryGuard.withBudget(1000L) {
      intercept[SimulatedOom] { DenseTensor.zeros(Array(11, 10, 10)) }
      DenseTensor.zeros(Array(10, 10, 10)) // exactly at budget: fine
    }
  }

  test("MemoryGuard.withBudget restores previous budget") {
    val before = MemoryGuard.budgetDoubles
    MemoryGuard.withBudget(1L) { assert(MemoryGuard.budgetDoubles == 1L) }
    assert(MemoryGuard.budgetDoubles == before)
  }

  test("maxAbsDiff detects the largest deviation") {
    val a = t234
    val b = t234
    b.data(5) += 0.25
    assert(math.abs(a.maxAbsDiff(b) - 0.25) < 1e-12)
  }
}
