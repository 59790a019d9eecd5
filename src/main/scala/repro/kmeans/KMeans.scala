package repro.kmeans

import repro.core.Pts
import scala.util.Random

/** Lloyd's k-means — the pivot-selection preprocessing of CFSFDP-A (Bai et al.).
  *
  * Deliberately plain (random init, fixed iterations): CFSFDP-A's weakness that
  * the paper highlights is precisely that k-means pivots give poor filtering
  * power on noisy data, so a fancy init would change the baseline's character.
  */
object KMeans {

  /** @param centroids final cluster centroids (k x d)
    * @param assign    index of the nearest centroid per point
    */
  final case class Model(centroids: Array[Array[Double]], assign: Array[Int])

  /** Fit k centroids with `iters` Lloyd iterations (single-threaded driver
    * preprocessing, matching the baseline's setup cost placement).
    */
  def fit(pts: Pts, k: Int, iters: Int = 5, seed: Long = 42L): Model = {
    require(k >= 1 && k <= pts.n, s"k=$k out of range for n=${pts.n}")
    val rnd  = new Random(seed)
    val init = rnd.shuffle((0 until pts.n).toVector).take(k)
    val cen  = init.map(i => pts.point(i)).toArray
    val assign = new Array[Int](pts.n)

    def assignAll(): Unit = {
      var i = 0
      while (i < pts.n) {
        var best  = 0
        var bestD = Double.PositiveInfinity
        var m = 0
        while (m < k) {
          val d2 = pts.dist2To(i, cen(m))
          if (d2 < bestD) { bestD = d2; best = m }
          m += 1
        }
        assign(i) = best
        i += 1
      }
    }

    var it = 0
    while (it < iters) {
      assignAll()
      val sums   = Array.fill(k)(new Array[Double](pts.d))
      val counts = new Array[Int](k)
      var i = 0
      while (i < pts.n) {
        val m = assign(i)
        counts(m) += 1
        var j = 0
        while (j < pts.d) { sums(m)(j) += pts.coord(i, j); j += 1 }
        i += 1
      }
      var m = 0
      while (m < k) {
        if (counts(m) > 0) {
          var j = 0
          while (j < pts.d) { cen(m)(j) = sums(m)(j) / counts(m); j += 1 }
        } // empty cluster: keep previous centroid
        m += 1
      }
      it += 1
    }
    assignAll()
    Model(cen, assign)
  }
}
