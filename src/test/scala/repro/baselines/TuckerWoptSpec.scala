package repro.baselines

import repro.{SparkSpec, TensorGen}
import repro.tensor.{MemoryGuard, SimulatedOom}

class TuckerWoptSpec extends SparkSpec {

  test("loss decreases monotonically (backtracking guarantee)") {
    val t = TensorGen.lowRank(spark, dims = Array(8, 7, 6), ranks = Array(2, 2, 2),
      nnz = 200, noiseSd = 0.05, seed = 4)
    val m = TuckerWopt.fit(spark, t, Array(2, 2, 2), maxIters = 15)
    m.history.map(_.error).sliding(2).foreach {
      case Seq(a, b) => assert(b <= a + 1e-10)
      case _         =>
    }
  }

  test("recovers a planted low-rank tensor accurately (observed-only loss)") {
    val t = TensorGen.lowRank(spark, dims = Array(8, 8, 8), ranks = Array(2, 2, 2),
      nnz = 350, noiseSd = 0.0, seed = 5)
    val m = TuckerWopt.fit(spark, t, Array(2, 2, 2), maxIters = 120)
    assert(m.history.last.fit > 0.9, s"fit ${m.history.last.fit}")
  }

  test("does not assume zeros: held-out RMSE beats the zero-predictor") {
    val t = TensorGen.lowRank(spark, dims = Array(9, 8, 7), ranks = Array(2, 2, 2),
      nnz = 400, noiseSd = 0.02, seed = 6, scaleTo = Some(1.0)).persisted()
    val (train, test) = t.split(0.85)
    val m = TuckerWopt.fit(spark, train, Array(2, 2, 2), maxIters = 120)
    val rmse = m.testRmse(spark, test, partitions = 2)
    val zeroRmse = math.sqrt(
      test.collectEntries().map { case (_, v) => v * v }.sum / test.nnz)
    assert(rmse < zeroRmse, s"rmse $rmse vs zero-predictor $zeroRmse")
    t.unpersist()
  }

  test("dense O(I^N) footprint hits the MemoryGuard (paper's O.O.M.)") {
    val t = TensorGen.uniform(spark, Array(60, 60, 60), 500, seed = 7)
    MemoryGuard.withBudget(100000L) { // 60^3 = 216000 doubles > budget
      intercept[SimulatedOom] {
        TuckerWopt.fit(spark, t, Array(2, 2, 2), maxIters = 2)
      }
    }
  }

  test("history carries per-iteration timing") {
    val t = TensorGen.uniform(spark, Array(5, 5, 5), 40, seed = 8)
    val m = TuckerWopt.fit(spark, t, Array(2, 2, 2), maxIters = 3)
    assert(m.history.size == 3)
    assert(m.history.forall(_.millis >= 0))
  }
}
