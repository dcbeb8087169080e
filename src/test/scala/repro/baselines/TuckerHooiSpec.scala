package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.linalg.DenseMatrix
import repro.tensor.{DenseTensor, MemoryGuard, SimulatedOom}

class TuckerHooiSpec extends AnyFunSuite {

  /** Exact rank-(2,2,2) dense tensor: G ×_1 A ×_2 B ×_3 C. */
  private def plantedDense(seed: Long): DenseTensor = {
    val g = DenseTensor.rand(Array(2, 2, 2), seed)
    val fs = Array(DenseMatrix.rand(8, 2, seed + 1), DenseMatrix.rand(7, 2, seed + 2),
      DenseMatrix.rand(6, 2, seed + 3))
    var t = g
    for (k <- 0 until 3) t = t.modeProduct(k, fs(k))
    t
  }

  test("recovers an exact low-rank tensor to machine-level fit") {
    val x = plantedDense(1)
    val m = TuckerHooi.fitDense(x, Array(2, 2, 2), maxIters = 12)
    val err = m.history.last.error
    assert(err < 1e-6 * x.frobeniusNorm, s"residual $err vs norm ${x.frobeniusNorm}")
  }

  test("loss is monotonically non-increasing (ALS property)") {
    val x = DenseTensor.rand(Array(6, 6, 6), 2)
    val m = TuckerHooi.fitDense(x, Array(2, 2, 2), maxIters = 8)
    m.history.map(_.error).sliding(2).foreach {
      case Seq(a, b) => assert(b <= a + 1e-8 * math.max(1.0, a))
      case _         =>
    }
  }

  test("factors are column-orthonormal") {
    val x = DenseTensor.rand(Array(6, 5, 4), 3)
    val m = TuckerHooi.fitDense(x, Array(2, 2, 2), maxIters = 4)
    m.factors.foreach(f => assert(f.gram.maxAbsDiff(DenseMatrix.eye(f.cols)) < 1e-8))
  }

  test("core equals X contracted with the factors") {
    val x = DenseTensor.rand(Array(5, 5, 5), 4)
    val m = TuckerHooi.fitDense(x, Array(2, 2, 2), maxIters = 3)
    val direct = TuckerHooi.coreOf(x, m.factors)
    assert(m.core.toDense.maxAbsDiff(direct) < 1e-10)
  }

  test("rank-1 on a rank-1 tensor is exact") {
    // x = a ⊗ b (outer product) has Tucker rank (1,1)
    val a = Array(1.0, 2.0, 3.0)
    val b = Array(4.0, 5.0)
    val x = DenseTensor.zeros(Array(3, 2))
    for (i <- 0 until 3; j <- 0 until 2) x(Array(i, j)) = a(i) * b(j)
    val m = TuckerHooi.fitDense(x, Array(1, 1), maxIters = 4)
    assert(m.history.last.error < 1e-9)
  }

  test("densification respects the MemoryGuard (paper's O.O.M. case)") {
    MemoryGuard.withBudget(100L) {
      intercept[SimulatedOom] { DenseTensor.zeros(Array(101, 1, 1)) }
    }
  }

  test("rejects ranks above dimensionality") {
    val x = DenseTensor.rand(Array(3, 3), 5)
    intercept[IllegalArgumentException] { TuckerHooi.fitDense(x, Array(4, 2), 1) }
  }
}
