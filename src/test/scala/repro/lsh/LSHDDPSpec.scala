package repro.lsh

import repro.{SparkSpec, TestUtil}
import repro.core._

/** LSH-DDP: approximation semantics and degradation behaviour. */
class LSHDDPSpec extends SparkSpec {

  test("approximate densities never exceed the exact ones") {
    val pts  = TestUtil.clusteredPts(600, 2, k = 3, sigma = 25.0, domain = 1000.0, seed = 800)
    val res  = LSHDDP.run(spark, pts, DPCParams(dcut = 50.0))
    val rhoB = TestUtil.bruteRho(pts, 50.0)
    (0 until pts.n).foreach { i =>
      assert(res.rho(i).toLong <= rhoB(i).toLong, s"point $i: approx rho above exact")
    }
  }

  test("dependency edges point to denser points (valid forest)") {
    val pts = TestUtil.clusteredPts(500, 3, k = 3, sigma = 30.0, domain = 1000.0, seed = 801)
    val res = LSHDDP.run(spark, pts, DPCParams(dcut = 60.0))
    (0 until pts.n).foreach { i =>
      if (res.depId(i) >= 0) assert(res.rho(res.depId(i)) > res.rho(i))
      else assert(res.delta(i).isInfinity)
    }
    assert(res.delta.count(_.isInfinity) === 1)
  }

  test("with one huge bucket LSH-DDP degenerates to the exact Scan result") {
    val pts  = TestUtil.clusteredPts(300, 2, k = 2, sigma = 20.0, domain = 1000.0, seed = 802)
    val res  = LSHDDP.run(spark, pts, DPCParams(dcut = 40.0, lshTables = 1, lshLen = 1, lshWidthFactor = 1e9))
    val rhoB = TestUtil.bruteRho(pts, 40.0)
    assert(res.rho.toSeq === rhoB.toSeq)
    val (_, deltaB) = TestUtil.bruteDependents(pts, rhoB)
    (0 until pts.n).foreach { i =>
      if (deltaB(i).isInfinity) assert(res.delta(i).isInfinity)
      else assert(math.abs(res.delta(i) - deltaB(i)) < 1e-7)
    }
  }

  test("fallback scan finds the true dependent point w.r.t. approximate densities") {
    val pts = TestUtil.clusteredPts(400, 2, k = 4, sigma = 15.0, domain = 1000.0, seed = 803)
    val res = LSHDDP.run(spark, pts, DPCParams(dcut = 30.0))
    // every returned delta must be the distance to some denser point, and no
    // denser point may be closer than the bucket-found one ONLY in the
    // fallback case; at minimum deltas upper-bound the true nearest-denser.
    (0 until pts.n).foreach { i =>
      if (res.depId(i) >= 0) {
        assert(math.abs(res.delta(i) - pts.dist(i, res.depId(i))) < 1e-9)
        val trueBest = (0 until pts.n)
          .filter(j => res.rho(j) > res.rho(i))
          .map(j => pts.dist(i, j)).min
        assert(res.delta(i) >= trueBest - 1e-9)
      }
    }
  }

  test("reasonable Rand index on clustered data") {
    val pts    = TestUtil.clusteredPts(1500, 2, k = 4, sigma = 18.0, domain = 1000.0, seed = 804)
    val params = DPCParams(dcut = 36.0, rhoMin = 5.0)
    val ex     = ExDPC.run(spark, pts, params)
    val deltaMin = DecisionGraph.deltaMinForK(ex, params.rhoMin, 4, params.dcut)
    val exL = Labels.assign(ex, params.rhoMin, deltaMin)
    val lsL = Labels.assign(LSHDDP.run(spark, pts, params), params.rhoMin, deltaMin)
    val ri  = RandIndex.of(exL, lsL)
    assert(ri > 0.7, s"LSH-DDP RI $ri unexpectedly low")
  }

  test("memory model counts the M tables") {
    val pts = TestUtil.uniformPts(400, 2, 1000.0, seed = 805)
    val r2  = LSHDDP.run(spark, pts, DPCParams(dcut = 40.0, lshTables = 2))
    val r8  = LSHDDP.run(spark, pts, DPCParams(dcut = 40.0, lshTables = 8))
    assert(r8.memBytes > r2.memBytes)
  }

  test("degenerate input: n=1") {
    val one = Pts.fromArrays(2, Seq(Array(1.0, 1.0)))
    val r   = LSHDDP.run(spark, one, DPCParams(dcut = 1.0))
    assert(r.delta(0).isInfinity && r.depId(0) === -1)
  }
}
