package repro.linalg

/** Lloyd's K-means with k-means++ seeding over dense row vectors.
  *
  * Used by the Table-V concept-discovery pipeline to cluster factor-matrix
  * rows (at most a few thousand points of dimension `J` ≤ 16, so a
  * driver-side implementation is the right altitude; the Spark work happens
  * upstream in the factorization).
  */
object KMeans {

  /** @return (assignments per point, centroids, within-cluster sum of squares) */
  def fit(points: Array[Array[Double]], k: Int, seed: Long = 7,
          maxIter: Int = 100, tol: Double = 1e-9): (Array[Int], Array[Array[Double]], Double) = {
    require(points.nonEmpty && k >= 1 && k <= points.length,
      s"need 1 <= k <= #points (k=$k, n=${points.length})")
    val dim = points(0).length
    val rng = new scala.util.Random(seed)

    // k-means++ seeding
    val centroids = Array.ofDim[Double](k, dim)
    val first = rng.nextInt(points.length)
    System.arraycopy(points(first), 0, centroids(0), 0, dim)
    val minDist2 = points.map(p => dist2(p, centroids(0)))
    var c = 1
    while (c < k) {
      val total = minDist2.sum
      val pick =
        if (total <= 0) rng.nextInt(points.length)
        else {
          var r = rng.nextDouble() * total; var i = 0
          while (i < points.length - 1 && r > minDist2(i)) { r -= minDist2(i); i += 1 }
          i
        }
      System.arraycopy(points(pick), 0, centroids(c), 0, dim)
      var i = 0
      while (i < points.length) {
        minDist2(i) = math.min(minDist2(i), dist2(points(i), centroids(c))); i += 1
      }
      c += 1
    }

    val assign = new Array[Int](points.length)
    var prevWcss = Double.MaxValue
    var wcss = 0.0
    var it = 0
    var converged = false
    while (it < maxIter && !converged) {
      wcss = 0.0
      var i = 0
      while (i < points.length) {
        var best = 0; var bestD = dist2(points(i), centroids(0))
        var j = 1
        while (j < k) {
          val d = dist2(points(i), centroids(j))
          if (d < bestD) { bestD = d; best = j }
          j += 1
        }
        assign(i) = best; wcss += bestD; i += 1
      }
      // recompute centroids; empty clusters are re-seeded from the farthest point
      val sums = Array.ofDim[Double](k, dim)
      val counts = new Array[Int](k)
      i = 0
      while (i < points.length) {
        val a = assign(i); counts(a) += 1
        var d = 0; while (d < dim) { sums(a)(d) += points(i)(d); d += 1 }
        i += 1
      }
      var j = 0
      while (j < k) {
        if (counts(j) == 0) {
          var far = 0; var farD = -1.0
          i = 0
          while (i < points.length) {
            val d = dist2(points(i), centroids(assign(i)))
            if (d > farD) { farD = d; far = i }
            i += 1
          }
          System.arraycopy(points(far), 0, centroids(j), 0, dim)
        } else {
          var d = 0; while (d < dim) { centroids(j)(d) = sums(j)(d) / counts(j); d += 1 }
        }
        j += 1
      }
      converged = prevWcss - wcss < tol * (1.0 + prevWcss)
      prevWcss = wcss
      it += 1
    }
    (assign, centroids, wcss)
  }

  @inline private def dist2(a: Array[Double], b: Array[Double]): Double = {
    var s = 0.0; var i = 0
    while (i < a.length) { val d = a(i) - b(i); s += d * d; i += 1 }
    s
  }

  /** Majority-label purity of a clustering against ground-truth labels —
    * the Table-V check that discovered concepts are real, not narrated.
    */
  def purity(assign: Array[Int], labels: Array[Int]): Double = {
    require(assign.length == labels.length && assign.nonEmpty)
    assign.zip(labels).groupBy(_._1).values
      .map(g => g.groupBy(_._2).values.map(_.length).max)
      .sum.toDouble / assign.length
  }
}
