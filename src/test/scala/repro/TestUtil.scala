package repro

import repro.core.{Jitter, Pts}
import scala.util.Random

/** Shared helpers for the unit suites: deterministic point generation and a
  * brute-force single-threaded DPC reference used to validate every index and
  * algorithm.
  */
object TestUtil {

  /** Uniform points in [0, domain]^d, deterministic in seed. */
  def uniformPts(n: Int, d: Int, domain: Double, seed: Long): Pts = {
    val rnd = new Random(seed)
    Pts.fromArrays(d, Seq.fill(n)(Array.fill(d)(rnd.nextDouble() * domain)))
  }

  /** k Gaussian clusters + background noise in [0, domain]^d. */
  def clusteredPts(
      n: Int,
      d: Int,
      k: Int,
      sigma: Double,
      domain: Double,
      seed: Long,
      noiseRate: Double = 0.02
  ): Pts = {
    val rnd     = new Random(seed)
    val centers = Array.fill(k)(Array.fill(d)(domain * (0.15 + 0.7 * rnd.nextDouble())))
    val rows = Seq.fill(n) {
      if (rnd.nextDouble() < noiseRate) Array.fill(d)(rnd.nextDouble() * domain)
      else {
        val c = centers(rnd.nextInt(k))
        Array.tabulate(d)(j => math.min(domain, math.max(0.0, c(j) + rnd.nextGaussian() * sigma)))
      }
    }
    Pts.fromArrays(d, rows)
  }

  /** Brute-force reference: exact jittered densities. */
  def bruteRho(pts: Pts, dcut: Double): Array[Double] = {
    val dcut2 = dcut * dcut
    Array.tabulate(pts.n) { i =>
      var cnt = 0
      var j = 0
      while (j < pts.n) {
        if (j != i && pts.dist2(i, j) < dcut2) cnt += 1
        j += 1
      }
      cnt + Jitter.frac(i)
    }
  }

  /** Brute-force reference: exact dependent points/distances given densities. */
  def bruteDependents(pts: Pts, rho: Array[Double]): (Array[Int], Array[Double]) = {
    val depId = new Array[Int](pts.n)
    val delta = new Array[Double](pts.n)
    var i = 0
    while (i < pts.n) {
      var bestId = -1
      var bestD2 = Double.PositiveInfinity
      var j = 0
      while (j < pts.n) {
        if (rho(j) > rho(i)) {
          val d2 = pts.dist2(i, j)
          if (d2 < bestD2) { bestD2 = d2; bestId = j }
        }
        j += 1
      }
      depId(i) = bestId
      delta(i) = if (bestId < 0) Double.PositiveInfinity else math.sqrt(bestD2)
      i += 1
    }
    (depId, delta)
  }

  /** Brute-force range count with strict radius. */
  def bruteRangeCount(pts: Pts, q: Array[Double], r: Double): Int = {
    val r2 = r * r
    (0 until pts.n).count(i => pts.dist2To(i, q) < r2)
  }

  /** Brute-force nearest neighbour over a subset of ids. */
  def bruteNearest(pts: Pts, ids: Seq[Int], q: Array[Double]): (Int, Double) = {
    var bestId = -1
    var bestD2 = Double.PositiveInfinity
    ids.foreach { i =>
      val d2 = pts.dist2To(i, q)
      if (d2 < bestD2) { bestD2 = d2; bestId = i }
    }
    (bestId, if (bestId < 0) Double.PositiveInfinity else math.sqrt(bestD2))
  }
}
