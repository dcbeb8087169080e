package repro.baselines

import org.apache.spark.sql.SparkSession
import repro.core.{IterStat, TuckerModel}
import repro.linalg.DenseMatrix
import repro.tensor.{CoreTensor, DenseTensor, SparseTensor}

/** Algorithm 1 of the paper: conventional Tucker-ALS (HOOI, De Lathauwer et
  * al.). Missing entries are treated as zeros — the tensor is densified —
  * and factor updates go through `Y = X ×_{k≠n} A^(k)ᵀ` plus a truncated
  * SVD of `Y_(n)`.
  *
  * This is both a baseline in its own right and the numerical ground truth
  * the sparse zero-filled competitors ([[SHotScan]], [[TuckerCsf]]) must
  * match, since all three compute the same mathematical update. Dense
  * allocations go through `MemoryGuard`, so large inputs raise
  * `SimulatedOom` exactly where the paper reports O.O.M.
  */
object TuckerHooi {

  def fit(spark: SparkSession, tensor: SparseTensor, ranks: Array[Int],
          maxIters: Int = 20, seed: Long = 17): TuckerModel = {
    val dense = DenseTensor.fromEntries(tensor.dims, toIterable(tensor))
    fitDense(dense, ranks, maxIters, seed)
  }

  private def toIterable(t: SparseTensor): Iterable[(Array[Int], Double)] =
    t.collectEntries().toIndexedSeq

  def fitDense(x: DenseTensor, ranks: Array[Int], maxIters: Int, seed: Long = 17): TuckerModel = {
    val order = x.order
    require(ranks.length == order)
    (0 until order).foreach(n => require(ranks(n) <= x.dims(n),
      s"mode $n rank ${ranks(n)} > dim ${x.dims(n)}"))

    // Random init then HOOI sweeps; orthonormalize via QR so the first
    // sweep's mode products are well-conditioned.
    val factors = Array.tabulate(order)(n =>
      DenseMatrix.qr(DenseMatrix.rand(x.dims(n), ranks(n), seed + n))._1)

    var history = Vector.empty[IterStat]
    val normX = x.frobeniusNorm
    var it = 0
    while (it < maxIters) {
      val t0 = System.nanoTime()
      var n = 0
      while (n < order) {
        // Y = X ×_1 A^(1)ᵀ … (skip n) … ×_N A^(N)ᵀ
        var y = x
        var k = 0
        while (k < order) {
          if (k != n) y = y.modeProduct(k, factors(k).transpose)
          k += 1
        }
        factors(n) = DenseMatrix.leadingLeftSingularVectors(y.matricize(n), ranks(n))
        n += 1
      }
      // Loss of Eq. (4): with orthonormal factors, ‖X - G×A…‖² = ‖X‖² - ‖G‖².
      val g = coreOf(x, factors)
      val err2 = math.max(normX * normX - g.frobeniusNorm * g.frobeniusNorm, 0.0)
      val err = math.sqrt(err2)
      history :+= IterStat(it + 1, (System.nanoTime() - t0) / 1000000L,
        err, 1.0 - err / normX, ranks.product)
      it += 1
    }
    val core = CoreTensor.fromDense(coreOf(x, factors))
    TuckerModel(x.dims, ranks, factors, core, history)
  }

  /** Algorithm 1 line 7: `G = X ×_1 A^(1)ᵀ … ×_N A^(N)ᵀ`. */
  def coreOf(x: DenseTensor, factors: Array[DenseMatrix]): DenseTensor = {
    var g = x
    var k = 0
    while (k < factors.length) { g = g.modeProduct(k, factors(k).transpose); k += 1 }
    g
  }
}
