package repro

import org.apache.spark.sql.functions._

class TensorGenSpec extends SparkSpec {

  test("uniform: indices within dims, values in [0,1), no duplicate cells") {
    val t = TensorGen.uniform(spark, Array(10, 20, 5), 500, seed = 1).persisted()
    val agg = t.df.agg(
      min("i0") as "mn0", max("i0") as "mx0",
      min("i1") as "mn1", max("i1") as "mx1",
      min("i2") as "mn2", max("i2") as "mx2",
      min("value") as "mnv", max("value") as "mxv").head
    assert(agg.getInt(0) >= 0 && agg.getInt(1) < 10)
    assert(agg.getInt(2) >= 0 && agg.getInt(3) < 20)
    assert(agg.getInt(4) >= 0 && agg.getInt(5) < 5)
    assert(agg.getDouble(6) >= 0.0 && agg.getDouble(7) < 1.0)
    assert(t.df.dropDuplicates("i0", "i1", "i2").count() == t.nnz)
    t.unpersist()
  }

  test("uniform: deterministic in the seed") {
    // compare materialized rows: exceptAll over a rand()-derived plan trips
    // Catalyst's non-deterministic-expression handling in Spark 4.1
    def rows(t: repro.tensor.SparseTensor) =
      t.collectEntries().map { case (i, v) => (i.toSeq, v) }.sortBy(_.toString).toSeq
    val a = TensorGen.uniform(spark, Array(8, 8, 8), 100, seed = 9)
    val b = TensorGen.uniform(spark, Array(8, 8, 8), 100, seed = 9)
    assert(rows(a) == rows(b))
  }

  test("uniform: nnz close to requested (only collision loss)") {
    val t = TensorGen.uniform(spark, Array(100, 100, 100), 5000, seed = 2)
    val n = t.nnz
    assert(n > 4900 && n <= 5000, s"nnz $n")
  }

  test("lowRank: values equal the planted Eq.-(5) model when noise is zero") {
    // a rank-consistent factorization must reach ~perfect fit; spot-checked
    // structurally here, behaviourally in PTuckerSpec
    val t = TensorGen.lowRank(spark, Array(6, 6, 6), Array(2, 2, 2), 100,
      noiseSd = 0.0, seed = 3)
    // same seed twice -> identical values (determinism incl. planted model)
    val t2 = TensorGen.lowRank(spark, Array(6, 6, 6), Array(2, 2, 2), 100,
      noiseSd = 0.0, seed = 3)
    assert(t.df.exceptAll(t2.df).count() == 0)
  }

  test("lowRank: scaleTo maps values into [0, hi]") {
    val t = TensorGen.lowRank(spark, Array(10, 10, 10), Array(2, 2, 2), 300,
      noiseSd = 0.1, seed = 4, scaleTo = Some(1.0))
    val Array(lo, hi) = t.df.agg(min("value"), max("value")).head.toSeq.map(_.asInstanceOf[Double]).toArray
    assert(lo >= -1e-12 && hi <= 1.0 + 1e-12)
    assert(hi - lo > 0.5, "normalized range should span most of [0,1]")
  }

  test("movieLensLike: ratings in [0,1], dims honoured") {
    val t = TensorGen.movieLensLike(spark, users = 100, movies = 60, years = 21,
      hours = 24, nnz = 3000, seed = 5).persisted()
    val r = t.df.agg(min("value"), max("value"), max("i0"), max("i1"), max("i2"), max("i3")).head
    assert(r.getDouble(0) >= 0.0 && r.getDouble(1) <= 1.0)
    assert(r.getInt(2) < 100 && r.getInt(3) < 60 && r.getInt(4) < 21 && r.getInt(5) < 24)
    t.unpersist()
  }

  test("movieLensLike: planted signal — preferred (user,genre,hour) cells rate higher (Oracle-checked)") {
    val t = TensorGen.movieLensLike(spark, users = 120, movies = 60, years = 21,
      hours = 24, nnz = 6000, noiseSd = 0.0, seed = 6).persisted()
    // Drama block of 60 movies with 6 genres: genre g = m*6/60 → drama (g=2) is m in [20,30)
    val dramaHours = TensorGen.GenreHours(2)
    val stats = t.df
      .where(col("i1") >= 20 && col("i1") < 30)
      .withColumn("pref", when(col("i3").isin(dramaHours.map(Integer.valueOf): _*), lit("pref"))
        .otherwise(lit("other")))
      .groupBy("pref").agg(avg("value") as "avg_rating")
    // cross-check the aggregation itself against DuckDB
    val hoursList = dramaHours.mkString(",")
    Oracle.assertEquivalent(stats,
      s"""SELECT CASE WHEN CAST(i3 AS INT) IN ($hoursList) THEN 'pref' ELSE 'other' END AS pref,
         |       AVG(CAST(value AS DOUBLE)) AS avg_rating
         |FROM t WHERE CAST(i1 AS INT) >= 20 AND CAST(i1 AS INT) < 30
         |GROUP BY 1""".stripMargin,
      "t" -> t.df.where(col("i1") >= 20 && col("i1") < 30)
        .withColumn("pref", when(col("i3").isin(dramaHours.map(Integer.valueOf): _*), lit("pref"))
          .otherwise(lit("other"))))
    val m = stats.collect().map(r => r.getString(0) -> r.getDouble(1)).toMap
    assert(m("pref") > m("other") + 0.1,
      s"preferred-hour ratings not higher: $m")
    t.unpersist()
  }

  test("videoLike and imageLike: paper dims, values in [0,1]") {
    val v = TensorGen.videoLike(spark, nnz = 2000)
    assert(v.dims.toSeq == Seq(112, 160, 3, 32))
    val i = TensorGen.imageLike(spark, nnz = 2000)
    assert(i.dims.toSeq == Seq(256, 256, 3))
    val rv = v.df.agg(min("value"), max("value")).head
    assert(rv.getDouble(0) >= 0.0 && rv.getDouble(1) <= 1.0)
  }

  test("yahooLike: 4-order with paper-shaped dims at reduced scale") {
    val y = TensorGen.yahooLike(spark, nnz = 2000)
    assert(y.dims.toSeq == Seq(3000, 2000, 50, 24))
    assert(y.nnz > 1900)
  }

  test("movieGenre: contiguous blocks covering all genres") {
    val genres = (0 until 60).map(TensorGen.movieGenre(_, 60))
    assert(genres.toSet == (0 until 6).toSet)
    assert(genres.sliding(2).forall { case Seq(a, b) => b >= a; case _ => true })
  }
}
