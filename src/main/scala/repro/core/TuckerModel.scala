package repro.core

import org.apache.spark.rdd.RDD
import org.apache.spark.sql.SparkSession
import repro.linalg.DenseMatrix
import repro.tensor.{CoreTensor, SparseTensor, TensorEntry}

/** Per-iteration record: wall time, Eq.-6 reconstruction error over the
  * training entries, fit = 1 - error/‖X‖, and the surviving core size
  * (shrinks only under P-Tucker-Approx).
  */
final case class IterStat(iter: Int, millis: Long, error: Double, fit: Double, coreNnz: Int)

/** A trained Tucker model: factor matrices `A^(n)` and core `G`.
  *
  * `predict` is Eq. (5); `reconstructionError` is Eq. (6);
  * `testRmse` is the paper's missing-entry metric (Section IV-E).
  */
final case class TuckerModel(dims: Array[Int], ranks: Array[Int],
                             factors: Array[DenseMatrix], core: CoreTensor,
                             history: Vector[IterStat],
                             meta: Map[String, Double] = Map.empty) {

  def order: Int = dims.length

  /** Eq. (5): predicted value of cell `idx`. */
  def predict(idx: Array[Int]): Double =
    TuckerKernels.predict(idx, factors.map(f => (f.cols, f.data)),
      core.entries.map(e => (e.idx, e.value)))

  /** Eq. (6) over the observed entries of `t`. */
  def reconstructionError(spark: SparkSession, t: SparseTensor, partitions: Int = 0): Double = {
    val p = if (partitions > 0) partitions else spark.sparkContext.defaultParallelism
    math.sqrt(TuckerKernels.sumSquaredError(spark, t.entriesRdd(p), factors, core))
  }

  /** Root mean squared prediction error over held-out entries. */
  def testRmse(spark: SparkSession, t: SparseTensor, partitions: Int = 0): Double = {
    val p = if (partitions > 0) partitions else spark.sparkContext.defaultParallelism
    val rdd = t.entriesRdd(p)
    val n = rdd.count()
    require(n > 0, "empty test set")
    math.sqrt(TuckerKernels.sumSquaredError(spark, rdd, factors, core) / n)
  }

  /** fit = 1 - ‖X - X'‖/‖X‖ over observed entries (Section IV-C). */
  def fit(spark: SparkSession, t: SparseTensor): Double =
    1.0 - reconstructionError(spark, t) / t.frobeniusNorm

  def avgMillisPerIter: Double =
    if (history.isEmpty) 0.0 else history.map(_.millis).sum.toDouble / history.size
}

/** Shared distributed kernels over (entries ⊗ core-cells): prediction and
  * squared-error sums. Factors/core travel as broadcast plain arrays to keep
  * task closures small.
  */
object TuckerKernels {

  /** Eq. (5) for one cell, over plain arrays: `factorData(k) = (cols, rowMajor)`. */
  def predict(idx: Array[Int], factorData: Array[(Int, Array[Double])],
              coreCells: Array[(Array[Int], Double)]): Double = {
    var v = 0.0
    var b = 0
    while (b < coreCells.length) {
      val (cIdx, g) = coreCells(b)
      var p = g
      var k = 0
      while (k < idx.length) {
        val (cols, data) = factorData(k)
        p *= data(idx(k) * cols + cIdx(k))
        k += 1
      }
      v += p
      b += 1
    }
    v
  }

  /** `Σ_{α∈Ω} (x_α - x̂_α)²` — the inside of Eq. (6), distributed. */
  def sumSquaredError(spark: SparkSession, entries: RDD[TensorEntry],
                      factors: Array[DenseMatrix], core: CoreTensor): Double = {
    val bF = spark.sparkContext.broadcast(factors.map(f => (f.cols, f.data)))
    val bC = spark.sparkContext.broadcast(core.entries.map(e => (e.idx, e.value)))
    try {
      entries
        .map { e =>
          val d = e.value - predict(e.idx, bF.value, bC.value)
          d * d
        }
        .treeReduce(_ + _)
    } finally { bF.destroy(); bC.destroy() }
  }
}
