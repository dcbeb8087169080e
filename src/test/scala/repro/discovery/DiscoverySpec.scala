package repro.discovery

import repro.{SparkSpec, TensorGen}
import repro.core.{PTucker, PTuckerConfig, TuckerModel}
import repro.linalg.DenseMatrix
import repro.tensor.{CoreEntry, CoreTensor}

class DiscoverySpec extends SparkSpec {

  test("concepts: hand-built factor rows cluster with purity 1") {
    // Two obvious groups of rows: ~(1,0) and ~(0,1)
    val rows = Array(
      Array(1.0, 0.0), Array(0.9, 0.1), Array(1.1, -0.1),
      Array(0.0, 1.0), Array(0.1, 0.9), Array(-0.1, 1.1))
    val f = DenseMatrix.fromRows(rows)
    val labels = Array(0, 0, 0, 1, 1, 1)
    val cs = ConceptDiscovery.concepts(f, k = 2, labels, samplesPerCluster = 2)
    assert(cs.length == 2)
    assert(cs.forall(_.purity == 1.0))
    assert(cs.map(_.size).sum == 6)
    cs.foreach(c => assert(c.sampleIndices.forall(i => labels(i) == c.dominantLabel)))
    assert(ConceptDiscovery.overallPurity(f, 2, labels) == 1.0)
  }

  test("topRelations: returns the largest-|value| core cells with top loadings") {
    val f0 = DenseMatrix.fromRows(Array(
      Array(0.1, 5.0), Array(0.2, 0.1), Array(9.0, 0.3))) // col0 top: row2; col1 top: row0
    val f1 = DenseMatrix.fromRows(Array(
      Array(7.0, 0.0), Array(0.5, 2.0)))                  // col0 top: row0; col1 top: row1
    val core = new CoreTensor(Array(2, 2), Array(
      CoreEntry(Array(0, 0), 10.0), CoreEntry(Array(1, 0), -20.0),
      CoreEntry(Array(0, 1), 1.0), CoreEntry(Array(1, 1), 0.5)))
    val model = TuckerModel(Array(3, 2), Array(2, 2), Array(f0, f1), core, Vector.empty)
    val rels = RelationDiscovery.topRelations(model, topK = 2, attrsPerMode = 1)
    assert(rels.length == 2)
    assert(rels.head.coreIdx.toSeq == Seq(1, 0) && rels.head.value == -20.0)
    assert(rels.head.topAttributes(0).toSeq == Seq(0)) // f0 col1 peaks at row 0
    assert(rels.head.topAttributes(1).toSeq == Seq(0)) // f1 col0 peaks at row 0
    assert(rels(1).coreIdx.toSeq == Seq(0, 0) && rels(1).value == 10.0)
  }

  test("end-to-end: P-Tucker on the MovieLens-like tensor recovers planted genres") {
    val t = TensorGen.movieLensLike(spark, users = 400, movies = 120, years = 21,
      hours = 24, nnz = 20000, noiseSd = 0.02, seed = 42).persisted()
    val model = PTucker.fit(spark, t, PTuckerConfig(
      ranks = Array(4, 4, 3, 3), lambda = 0.01, maxIters = 8, tol = 1e-6, partitions = 8))

    // Table-V analog: movie-mode factor rows cluster by planted genre.
    val labels = Array.tabulate(120)(m => TensorGen.movieGenre(m, 120))
    val purity = ConceptDiscovery.overallPurity(model.factors(1), k = 8, labels)
    assert(purity > 0.5, s"genre purity $purity")

    // Table-VI analog: among the top core cells, the hour-mode column of at
    // least one relation loads on the planted preferred hours of the genre
    // dominating its movie-mode column.
    val rels = RelationDiscovery.topRelations(model, topK = 3, attrsPerMode = 5)
    val anyAligned = rels.exists { r =>
      val movieTop = r.topAttributes(1)
      val genreOfTop = movieTop.map(m => TensorGen.movieGenre(m, 120))
        .groupBy(identity).maxBy(_._2.length)._1
      val hourTop = r.topAttributes(3).toSet
      TensorGen.GenreHours(genreOfTop).count(hourTop.contains) >= 1
    }
    assert(anyAligned, s"no top relation aligned with planted genre-hour structure: $rels")
    t.unpersist()
  }
}
