package repro.linalg

import org.scalatest.funsuite.AnyFunSuite

class KMeansSpec extends AnyFunSuite {

  /** Three well-separated Gaussian blobs in 2D. */
  private def blobs(perCluster: Int, seed: Long): (Array[Array[Double]], Array[Int]) = {
    val rng = new scala.util.Random(seed)
    val centers = Array(Array(0.0, 0.0), Array(10.0, 0.0), Array(0.0, 10.0))
    val pts = Array.newBuilder[Array[Double]]
    val lbl = Array.newBuilder[Int]
    for (c <- centers.indices; _ <- 0 until perCluster) {
      pts += Array(centers(c)(0) + rng.nextGaussian() * 0.3,
                   centers(c)(1) + rng.nextGaussian() * 0.3)
      lbl += c
    }
    (pts.result(), lbl.result())
  }

  test("recovers well-separated blobs with purity 1.0") {
    val (pts, lbl) = blobs(40, 1)
    val (assign, _, _) = KMeans.fit(pts, 3, seed = 5)
    assert(KMeans.purity(assign, lbl) == 1.0)
  }

  test("centroids land near true centers") {
    val (pts, _) = blobs(60, 2)
    val (_, cents, _) = KMeans.fit(pts, 3, seed = 5)
    val targets = Seq((0.0, 0.0), (10.0, 0.0), (0.0, 10.0))
    for ((tx, ty) <- targets) {
      val d = cents.map(c => math.hypot(c(0) - tx, c(1) - ty)).min
      assert(d < 0.5, s"no centroid near ($tx,$ty); min dist $d")
    }
  }

  test("wcss decreases as k grows") {
    val (pts, _) = blobs(30, 3)
    val w1 = KMeans.fit(pts, 1, seed = 5)._3
    val w3 = KMeans.fit(pts, 3, seed = 5)._3
    val w6 = KMeans.fit(pts, 6, seed = 5)._3
    assert(w1 > w3 && w3 >= w6)
  }

  test("deterministic for fixed seed") {
    val (pts, _) = blobs(30, 4)
    val a1 = KMeans.fit(pts, 3, seed = 9)._1
    val a2 = KMeans.fit(pts, 3, seed = 9)._1
    assert(a1.toSeq == a2.toSeq)
  }

  test("k equal to number of points gives zero wcss") {
    val pts = Array(Array(1.0), Array(2.0), Array(5.0))
    val (_, _, wcss) = KMeans.fit(pts, 3, seed = 1)
    assert(wcss < 1e-12)
  }

  test("rejects invalid k") {
    val pts = Array(Array(1.0), Array(2.0))
    intercept[IllegalArgumentException] { KMeans.fit(pts, 0) }
    intercept[IllegalArgumentException] { KMeans.fit(pts, 3) }
  }

  test("purity: hand example") {
    // clusters {0,0,1} vs labels {a,a,b} -> cluster0 pure 'a'(2), cluster1 pure 'b'(1)
    assert(KMeans.purity(Array(0, 0, 1), Array(0, 0, 1)) == 1.0)
    assert(math.abs(KMeans.purity(Array(0, 0, 0, 0), Array(0, 0, 1, 1)) - 0.5) < 1e-12)
  }

  test("handles duplicate points (degenerate seeding)") {
    val pts = Array.fill(20)(Array(1.0, 1.0))
    val (assign, _, wcss) = KMeans.fit(pts, 3, seed = 2)
    assert(assign.length == 20 && wcss < 1e-12)
  }
}
