package repro.lsh

import scala.util.Random

/** p-stable locality-sensitive hashing (Datar et al. 2004).
  *
  * `m` compound hashes, each the concatenation of `l` functions
  * `h_{a,b}(p) = floor((a . p + b) / w)` with Gaussian `a` and uniform offset
  * `b in [0, w)`. Points sharing a compound key in a table land in the same
  * bucket — the partitioning LSH-DDP clusters within.
  */
final class PStableLSH(val d: Int, val m: Int, val l: Int, val w: Double, seed: Long)
    extends Serializable {
  require(d > 0 && m > 0 && l > 0 && w > 0, "invalid LSH parameters")

  private val a: Array[Array[Array[Double]]] = {
    val rnd = new Random(seed)
    Array.fill(m, l)(Array.fill(d)(rnd.nextGaussian()))
  }
  private val b: Array[Array[Double]] = {
    val rnd = new Random(seed + 1)
    Array.fill(m, l)(rnd.nextDouble() * w)
  }

  /** Compound key of point `p` in table `table` (length-`l` vector). */
  def key(table: Int, p: Array[Double]): Seq[Int] = {
    val out = new Array[Int](l)
    var i = 0
    while (i < l) {
      var dot = 0.0
      var j = 0
      val ai = a(table)(i)
      while (j < d) { dot += ai(j) * p(j); j += 1 }
      out(i) = math.floor((dot + b(table)(i)) / w).toInt
      i += 1
    }
    out.toIndexedSeq
  }

  /** Modelled footprint of the hash parameters. */
  def paramBytes: Long = m.toLong * l * (8L * d + 8L)
}
