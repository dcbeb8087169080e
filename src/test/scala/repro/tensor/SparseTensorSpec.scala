package repro.tensor

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, TensorGen}

class SparseTensorSpec extends SparkSpec {

  private lazy val tiny = SparseTensor.fromEntries(spark, Array(3, 4, 2), Seq(
    (Array(0, 0, 0), 1.0), (Array(1, 2, 0), 2.0), (Array(2, 3, 1), 3.0),
    (Array(0, 1, 1), 4.0), (Array(1, 1, 0), 5.0)))

  test("nnz counts entries") {
    assert(tiny.nnz == 5)
  }

  test("indexCols naming") {
    assert(tiny.indexCols == Seq("i0", "i1", "i2"))
  }

  test("frobeniusNorm matches DuckDB oracle") {
    val sparkSide = tiny.df.agg(
      sqrt(sum(col("value") * col("value"))) as "fnorm")
    Oracle.assertEquivalent(sparkSide,
      "SELECT SQRT(SUM(CAST(value AS DOUBLE) * CAST(value AS DOUBLE))) AS fnorm FROM t",
      "t" -> tiny.df)
    assert(math.abs(tiny.frobeniusNorm - math.sqrt(1 + 4 + 9 + 16 + 25)) < 1e-12)
  }

  test("per-slice cardinality |Ω^(n)_{i_n}| matches DuckDB oracle") {
    val sparkSide = tiny.df.groupBy("i1").agg(count(lit(1)) as "cnt")
    Oracle.assertEquivalent(sparkSide,
      "SELECT i1, COUNT(*) AS cnt FROM t GROUP BY i1",
      "t" -> tiny.df)
  }

  test("entriesRdd round-trips the DataFrame") {
    val got = tiny.entriesRdd(2).collect()
      .map(e => (e.idx.toSeq, e.value)).sortBy(_.toString)
    val want = tiny.collectEntries()
      .map { case (i, v) => (i.toSeq, v) }.sortBy(_.toString)
    assert(got.toSeq == want.toSeq)
  }

  test("entriesRdd respects requested partition count") {
    assert(tiny.entriesRdd(3).getNumPartitions == 3)
  }

  test("split is disjoint, exhaustive, and deterministic") {
    val t = TensorGen.uniform(spark, Array(20, 20, 20), 2000, seed = 5).persisted()
    val (tr1, te1) = t.split(0.9)
    val (tr2, te2) = t.split(0.9)
    val n = t.nnz
    val nTr = tr1.nnz; val nTe = te1.nnz
    assert(nTr + nTe == n, "split not exhaustive")
    assert(tr1.df.intersect(te1.df).count() == 0, "split not disjoint")
    assert(tr2.nnz == nTr && te2.nnz == nTe, "split not deterministic")
    assert(nTe > 0 && nTe < n / 5, s"test fraction off: $nTe of $n")
    t.unpersist()
  }

  test("split ratio is approximately honored") {
    val t = TensorGen.uniform(spark, Array(50, 50, 50), 5000, seed = 6)
    val (tr, _) = t.split(0.8)
    val frac = tr.nnz.toDouble / t.nnz
    assert(frac > 0.75 && frac < 0.85, s"train fraction $frac")
  }

  test("fromEntries rejects nothing valid / builds correct schema") {
    assert(tiny.df.schema.fieldNames.toSeq == Seq("i0", "i1", "i2", "value"))
  }
}
