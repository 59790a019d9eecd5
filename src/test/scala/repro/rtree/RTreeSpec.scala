package repro.rtree

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import repro.core.Pts
import scala.util.Random

/** STR R-tree vs brute force. */
class RTreeSpec extends AnyFunSuite {

  for (d <- Seq(1, 2, 3, 4, 8); n <- Seq(1, 31, 64, 500)) {
    val pts  = TestUtil.uniformPts(n, d, domain = 100.0, seed = 300L * d + n)
    val tree = new RTree(pts).buildAll()
    val rnd  = new Random(17L * d + n)

    test(s"rangeCount matches brute force (d=$d, n=$n)") {
      for (_ <- 1 to 5) {
        val q = Array.fill(d)(rnd.nextDouble() * 100.0)
        for (r <- Seq(0.5, 5.0, 30.0, 300.0)) {
          assert(tree.rangeCount(q, r) === TestUtil.bruteRangeCount(pts, q, r))
        }
      }
    }
  }

  test("whole-space query counts everything; empty-region query counts nothing") {
    val pts  = TestUtil.uniformPts(200, 3, 10.0, seed = 9)
    val tree = new RTree(pts).buildAll()
    assert(tree.rangeCount(Array(5.0, 5.0, 5.0), 1e6) === 200)
    assert(tree.rangeCount(Array(500.0, 500.0, 500.0), 1.0) === 0)
  }

  test("clustered data: counts still exact") {
    val pts  = TestUtil.clusteredPts(600, 2, k = 4, sigma = 2.0, domain = 100.0, seed = 10)
    val tree = new RTree(pts).buildAll()
    val rnd  = new Random(11)
    for (_ <- 1 to 10) {
      val i = rnd.nextInt(pts.n)
      val q = pts.point(i)
      for (r <- Seq(1.0, 4.0, 16.0)) {
        assert(tree.rangeCount(q, r) === TestUtil.bruteRangeCount(pts, q, r))
      }
    }
  }

  test("strictness: a point exactly at distance r is not counted") {
    val pts  = Pts.fromArrays(1, Seq(Array(0.0), Array(10.0)))
    val tree = new RTree(pts).buildAll()
    assert(tree.rangeCount(Array(0.0), 10.0) === 1) // only the point itself
    assert(tree.rangeCount(Array(0.0), 10.0 + 1e-9) === 2)
  }

  test("memBytes is positive and grows with n") {
    val small = new RTree(TestUtil.uniformPts(50, 2, 10.0, seed = 1)).buildAll()
    val big   = new RTree(TestUtil.uniformPts(5000, 2, 10.0, seed = 2)).buildAll()
    assert(small.memBytes > 0 && big.memBytes > small.memBytes)
  }
}
