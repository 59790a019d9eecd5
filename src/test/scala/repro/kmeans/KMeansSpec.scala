package repro.kmeans

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import repro.core.Pts

class KMeansSpec extends AnyFunSuite {

  test("assignments are the nearest centroid") {
    val pts = TestUtil.uniformPts(400, 3, 100.0, seed = 50)
    val m   = KMeans.fit(pts, k = 8)
    (0 until pts.n).foreach { i =>
      val own  = pts.dist2To(i, m.centroids(m.assign(i)))
      val best = m.centroids.map(c => pts.dist2To(i, c)).min
      assert(math.abs(own - best) < 1e-9)
    }
  }

  test("k=1 puts the centroid at the mean") {
    val pts = TestUtil.uniformPts(500, 2, 10.0, seed = 51)
    val m   = KMeans.fit(pts, k = 1)
    (0 until 2).foreach { j =>
      val mean = (0 until pts.n).map(i => pts.coord(i, j)).sum / pts.n
      assert(math.abs(m.centroids(0)(j) - mean) < 1e-6)
    }
  }

  test("well-separated clusters are recovered") {
    val rows = (0 until 100).map(i => Array(0.0 + i % 10 * 0.1, 0.0)) ++
      (0 until 100).map(i => Array(1000.0 + i % 10 * 0.1, 1000.0))
    val pts = Pts.fromArrays(2, rows)
    val m   = KMeans.fit(pts, k = 2, iters = 10)
    val g0  = m.assign(0)
    assert((0 until 100).forall(m.assign(_) == g0))
    assert((100 until 200).forall(m.assign(_) == 1 - g0))
  }

  test("deterministic in seed") {
    val pts = TestUtil.uniformPts(300, 2, 100.0, seed = 52)
    val a   = KMeans.fit(pts, k = 5, seed = 99)
    val b   = KMeans.fit(pts, k = 5, seed = 99)
    assert(a.assign.toSeq === b.assign.toSeq)
  }

  test("k = n degenerates gracefully") {
    val pts = TestUtil.uniformPts(20, 2, 10.0, seed = 53)
    val m   = KMeans.fit(pts, k = 20)
    assert(m.centroids.length === 20)
  }

  test("rejects invalid k") {
    val pts = TestUtil.uniformPts(10, 2, 10.0, seed = 54)
    intercept[IllegalArgumentException](KMeans.fit(pts, k = 0))
    intercept[IllegalArgumentException](KMeans.fit(pts, k = 11))
  }
}
