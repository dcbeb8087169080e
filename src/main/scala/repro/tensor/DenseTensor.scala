package repro.tensor

import repro.linalg.DenseMatrix

/** Dense N-order tensor with the paper's column-major linearization: index
  * `(i_1,…,i_N)` (0-based here) maps to `i_1 + I_1·i_2 + I_1·I_2·i_3 + …`,
  * which makes mode-n matricization exactly Eq. (2) of the paper.
  *
  * This is the substrate for the HOOI / Tucker-wOPT baselines and for the
  * final `G ×_n R` core update. All allocations pass through [[MemoryGuard]]
  * so the paper's O.O.M. cases surface as [[SimulatedOom]] instead of
  * wedging the JVM.
  */
final class DenseTensor(val dims: Array[Int], val data: Array[Double]) extends Serializable {
  require(data.length == dims.product, s"data ${data.length} != ${dims.mkString("x")}")

  def order: Int = dims.length

  /** Linear offset of a multi-index (0-based). */
  def offset(idx: Array[Int]): Int = {
    var off = 0; var stride = 1; var k = 0
    while (k < dims.length) { off += idx(k) * stride; stride *= dims(k); k += 1 }
    off
  }

  def apply(idx: Array[Int]): Double = data(offset(idx))
  def update(idx: Array[Int], v: Double): Unit = data(offset(idx)) = v

  def frobeniusNorm: Double = {
    var s = 0.0; var i = 0
    while (i < data.length) { s += data(i) * data(i); i += 1 }
    math.sqrt(s)
  }

  /** Mode-n matricization `X_(n)` (`I_n × ∏_{m≠n} I_m`) per Eq. (2). */
  def matricize(n: Int): DenseMatrix = {
    val rows = dims(n)
    val cols = data.length / rows
    val out = DenseMatrix.zeros(rows, cols)
    val idx = new Array[Int](order)
    var lin = 0
    while (lin < data.length) {
      // decode lin -> idx (column-major)
      var rem = lin; var k = 0
      while (k < order) { idx(k) = rem % dims(k); rem /= dims(k); k += 1 }
      // Eq. (2), 0-based: j = sum_{k!=n} idx(k) * prod_{m<k, m!=n} I_m
      var j = 0; var stride = 1
      k = 0
      while (k < order) {
        if (k != n) { j += idx(k) * stride; stride *= dims(k) }
        k += 1
      }
      out(idx(n), j) = data(lin)
      lin += 1
    }
    out
  }

  /** n-mode product `X ×_n U` where `U` is `R × I_n` (Eq. 3): the mode-n
    * dimensionality becomes `R`.
    */
  def modeProduct(n: Int, u: DenseMatrix): DenseTensor = {
    require(u.cols == dims(n), s"mode-$n product: U cols ${u.cols} != dim ${dims(n)}")
    val newDims = dims.clone(); newDims(n) = u.rows
    val out = DenseTensor.zeros(newDims)
    val idx = new Array[Int](order)
    var lin = 0
    while (lin < data.length) {
      val v = data(lin)
      if (v != 0.0) {
        var rem = lin; var k = 0
        while (k < order) { idx(k) = rem % dims(k); rem /= dims(k); k += 1 }
        val in = idx(n)
        var r = 0
        while (r < u.rows) {
          val w = u(r, in)
          if (w != 0.0) {
            idx(n) = r
            out.data(out.offset(idx)) += v * w
          }
          r += 1
        }
        idx(n) = in
      }
      lin += 1
    }
    out
  }

  def maxAbsDiff(b: DenseTensor): Double = {
    require(java.util.Arrays.equals(dims, b.dims))
    var m = 0.0; var i = 0
    while (i < data.length) { m = math.max(m, math.abs(data(i) - b.data(i))); i += 1 }
    m
  }
}

object DenseTensor {
  def zeros(dims: Array[Int]): DenseTensor = {
    MemoryGuard.checkAllocation(dims.map(_.toLong).product)
    new DenseTensor(dims.clone(), new Array[Double](dims.product))
  }

  /** Zero-filled densification of sparse entries — the semantic the
    * HOOI-family baselines apply to missing values.
    */
  def fromEntries(dims: Array[Int], entries: Iterable[(Array[Int], Double)]): DenseTensor = {
    val t = zeros(dims)
    entries.foreach { case (idx, v) => t(idx) = v }
    t
  }

  def rand(dims: Array[Int], seed: Long): DenseTensor = {
    MemoryGuard.checkAllocation(dims.map(_.toLong).product)
    val rng = new scala.util.Random(seed)
    new DenseTensor(dims.clone(), Array.fill(dims.product)(rng.nextDouble()))
  }

  /** Enumerates all multi-indices of `dims` in column-major order. */
  def indices(dims: Array[Int]): Iterator[Array[Int]] = new Iterator[Array[Int]] {
    private val total = dims.map(_.toLong).product
    private var lin = 0L
    def hasNext: Boolean = lin < total
    def next(): Array[Int] = {
      val idx = new Array[Int](dims.length)
      var rem = lin; var k = 0
      while (k < dims.length) { idx(k) = (rem % dims(k)).toInt; rem /= dims(k); k += 1 }
      lin += 1
      idx
    }
  }
}

/** Thrown when a dense allocation exceeds the configured budget — reproduces
  * the paper's O.O.M. entries (Tucker-wOPT on every large sweep) without
  * actually exhausting the container.
  */
final class SimulatedOom(requestedDoubles: Long, budgetDoubles: Long)
  extends RuntimeException(
    s"O.O.M. (simulated): dense allocation of $requestedDoubles doubles " +
    s"(~${requestedDoubles * 8 / (1 << 20)} MiB) exceeds budget of $budgetDoubles doubles")

/** Global dense-allocation budget. The paper's machine had 512 GB; we scale
  * the budget with the scaled-down experiments (default 2^27 doubles = 1 GiB)
  * so the *pattern* of which methods die where is preserved.
  */
object MemoryGuard {
  @volatile var budgetDoubles: Long = 1L << 27

  def checkAllocation(nDoubles: Long): Unit =
    if (nDoubles > budgetDoubles) throw new SimulatedOom(nDoubles, budgetDoubles)

  /** Runs `f` under a temporary budget; restores the previous budget after. */
  def withBudget[A](doubles: Long)(f: => A): A = {
    val prev = budgetDoubles
    budgetDoubles = doubles
    try f finally budgetDoubles = prev
  }
}
