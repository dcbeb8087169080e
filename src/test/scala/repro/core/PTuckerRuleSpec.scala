package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.linalg.DenseMatrix
import repro.tensor.CoreTensor

/** Verifies the Eq. (10)-(13) kernels against straight-from-the-definition
  * reference implementations and a numerical argmin check (Theorem 1).
  * Driver-side only — no Spark needed at this altitude.
  */
class PTuckerRuleSpec extends AnyFunSuite {

  private val dims = Array(4, 5, 3)
  private val ranks = Array(2, 3, 2)
  private val seed = 13L
  private val factors = Array.tabulate(3)(n => DenseMatrix.rand(dims(n), ranks(n), seed + n))
  private val core = CoreTensor.rand(ranks, seed + 100)
  private val fd = factors.map(f => (f.cols, f.data))
  private val cc = core.entries.map(e => (e.idx, e.value))

  private val rng = new scala.util.Random(7)
  private val entries: Seq[(Array[Int], Double)] = (0 until 40).map { _ =>
    (Array(rng.nextInt(dims(0)), rng.nextInt(dims(1)), rng.nextInt(dims(2))), rng.nextDouble())
  }

  /** Eq. (13) literally: δ(j) = Σ_{β: β_n=j} G_β ∏_{k≠n} a^(k)_{i_k β_k}. */
  private def refDelta(idx: Array[Int], n: Int): Array[Double] = {
    val out = new Array[Double](ranks(n))
    for (e <- core.entries) {
      var p = e.value
      for (k <- 0 until 3 if k != n) p *= factors(k)(idx(k), e.idx(k))
      out(e.idx(n)) += p
    }
    out
  }

  /** Eq. (5) literally. */
  private def refPredict(idx: Array[Int]): Double =
    core.entries.map { e =>
      e.value * (0 until 3).map(k => factors(k)(idx(k), e.idx(k))).product
    }.sum

  test("computeDelta matches the Eq. (13) reference for every entry and mode") {
    for ((idx, _) <- entries; n <- 0 until 3) {
      val got = PTucker.computeDelta(idx, n, ranks(n), fd, cc)
      val want = refDelta(idx, n)
      assert(got.zip(want).forall { case (a, b) => math.abs(a - b) < 1e-12 },
        s"delta mismatch at ${idx.toSeq} mode $n")
    }
  }

  test("computePres matches G_β · ∏_k a^(k)") {
    for ((idx, _) <- entries.take(10)) {
      val got = PTucker.computePres(idx, fd, cc)
      core.entries.zipWithIndex.foreach { case (e, b) =>
        val want = e.value * (0 until 3).map(k => factors(k)(idx(k), e.idx(k))).product
        assert(math.abs(got(b) - want) < 1e-12)
      }
    }
  }

  test("sum of Pres over cells equals the Eq. (5) prediction") {
    for ((idx, _) <- entries.take(10)) {
      val pres = PTucker.computePres(idx, fd, cc)
      assert(math.abs(pres.sum - refPredict(idx)) < 1e-10)
    }
  }

  test("deltaFromPres reproduces computeDelta when no factor entry is zero") {
    for ((idx, _) <- entries.take(10); n <- 0 until 3) {
      val pres = PTucker.computePres(idx, fd, cc)
      val viaCache = PTucker.deltaFromPres(idx, pres, n, ranks(n), fd, cc)
      val direct = PTucker.computeDelta(idx, n, ranks(n), fd, cc)
      assert(viaCache.zip(direct).forall { case (a, b) => math.abs(a - b) < 1e-9 })
    }
  }

  test("deltaFromPres falls back to recomputation at a zero factor entry") {
    val fzero = factors.map(_.copy)
    fzero(0)(2, 1) = 0.0
    val fdz = fzero.map(f => (f.cols, f.data))
    val idx = Array(2, 1, 0)
    val pres = PTucker.computePres(idx, fdz, cc) // some cells are exactly 0
    val viaCache = PTucker.deltaFromPres(idx, pres, 0, ranks(0), fdz, cc)
    val direct = PTucker.computeDelta(idx, 0, ranks(0), fdz, cc)
    assert(viaCache.zip(direct).forall { case (a, b) => math.abs(a - b) < 1e-9 })
  }

  test("patchPres: after a factor update, patched Pres equals fresh recomputation") {
    val updated = factors.map(_.copy)
    updated(1) = DenseMatrix.rand(dims(1), ranks(1), 999)
    val fdNew = updated.map(f => (f.cols, f.data))
    for ((idx, _) <- entries.take(10)) {
      val old = PTucker.computePres(idx, fd, cc)
      val patched = PTucker.patchPres(idx, old, 1,
        (factors(1).cols, factors(1).data), (updated(1).cols, updated(1).data), cc, fdNew)
      val fresh = PTucker.computePres(idx, fdNew, cc)
      assert(patched.zip(fresh).forall { case (a, b) => math.abs(a - b) < 1e-9 })
    }
  }

  test("accumulate builds B = Σ δδᵀ and c = Σ x·δ") {
    val jn = ranks(0)
    val acc = (new Array[Double](jn * jn), new Array[Double](jn))
    val mine = entries.filter(_._1(0) == 1)
    mine.foreach { case (idx, x) =>
      PTucker.accumulate(acc, PTucker.computeDelta(idx, 0, jn, fd, cc), x)
    }
    val bWant = Array.ofDim[Double](jn, jn)
    val cWant = new Array[Double](jn)
    mine.foreach { case (idx, x) =>
      val d = refDelta(idx, 0)
      for (a <- 0 until jn; b <- 0 until jn) bWant(a)(b) += d(a) * d(b)
      for (a <- 0 until jn) cWant(a) += x * d(a)
    }
    for (a <- 0 until jn; b <- 0 until jn)
      assert(math.abs(acc._1(a * jn + b) - bWant(a)(b)) < 1e-10)
    for (a <- 0 until jn) assert(math.abs(acc._2(a) - cWant(a)) < 1e-10)
  }

  test("mergeAcc adds componentwise") {
    val x = (Array(1.0, 2.0, 3.0, 4.0), Array(5.0, 6.0))
    val y = (Array(10.0, 20.0, 30.0, 40.0), Array(50.0, 60.0))
    val m = PTucker.mergeAcc(x, y)
    assert(m._1.toSeq == Seq(11.0, 22.0, 33.0, 44.0) && m._2.toSeq == Seq(55.0, 66.0))
  }

  test("solveRow solves row·(B+λI) = c") {
    val jn = 3
    val rnd = new scala.util.Random(3)
    val bHalf = DenseMatrix.rand(jn, jn, 4)
    val bSym = bHalf.gram // symmetric PSD like a real B
    val c = Array.fill(jn)(rnd.nextDouble())
    val lambda = 0.05
    val row = PTucker.solveRow((bSym.data.clone(), c.clone()), jn, lambda)
    // check row · (B + λI) == c
    for (j <- 0 until jn) {
      val got = (0 until jn).map(i => row(i) * (bSym(i, j) + (if (i == j) lambda else 0.0))).sum
      assert(math.abs(got - c(j)) < 1e-9)
    }
  }

  test("Theorem 1: the updated row is a local (hence global, convex) minimum of the loss") {
    val lambda = 0.01
    val n = 0
    val i0 = 1
    val jn = ranks(n)
    val mine = entries.filter(_._1(0) == i0)
    assert(mine.nonEmpty)
    val acc = (new Array[Double](jn * jn), new Array[Double](jn))
    mine.foreach { case (idx, x) =>
      PTucker.accumulate(acc, PTucker.computeDelta(idx, n, jn, fd, cc), x)
    }
    val row = PTucker.solveRow(acc, jn, lambda)

    // Loss restricted to this row (other rows' terms are constants):
    def loss(r: Array[Double]): Double = {
      val f2 = factors.map(_.copy)
      f2(n).setRow(i0, r)
      val sse = mine.map { case (idx, x) =>
        val pred = core.entries.map { e =>
          e.value * (0 until 3).map(k => f2(k)(idx(k), e.idx(k))).product
        }.sum
        val d = x - pred
        d * d
      }.sum
      sse + lambda * r.map(v => v * v).sum
    }

    val base = loss(row)
    val eps = 1e-4
    for (j <- 0 until jn; s <- Seq(-1.0, 1.0)) {
      val pert = row.clone(); pert(j) += s * eps
      assert(loss(pert) >= base - 1e-12,
        s"perturbing coord $j by ${s * eps} decreased the loss")
    }
    // gradient ≈ 0 via central differences
    for (j <- 0 until jn) {
      val p = row.clone(); p(j) += eps
      val m = row.clone(); m(j) -= eps
      val g = (loss(p) - loss(m)) / (2 * eps)
      assert(math.abs(g) < 1e-6, s"gradient at coord $j is $g")
    }
  }

  test("intermediateDoubles follows the Table III models") {
    val cfg = PTuckerConfig(ranks = Array(3, 3, 3))
    val j = 3L; val coreSize = 27L; val t = 4; val nnz = 1000L
    val perTask = t * (2 * j * j + 2 * j)
    assert(PTucker.intermediateDoubles(cfg, t, nnz) == perTask)
    assert(PTucker.intermediateDoubles(cfg.copy(variant = PTuckerVariant.Cache), t, nnz)
      == nnz * coreSize + perTask)
    assert(PTucker.intermediateDoubles(cfg.copy(variant = PTuckerVariant.Approx), t, nnz)
      == coreSize + perTask)
  }
}
