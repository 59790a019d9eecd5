package repro.core

import org.apache.spark.sql.SparkSession
import repro.kdtree.KdTree

/** Ex-DPC (§3): the exact algorithm.
  *
  * Densities: one kd-tree range count per point, parallelized across Spark
  * tasks with dynamic oversubscription (the paper's
  * `omp parallel for schedule(dynamic)`).
  *
  * Dependent points: the kd-tree is destroyed and rebuilt *incrementally* in
  * descending density order — when point p is processed the tree holds exactly
  * the points denser than p, so a plain NN search returns the true dependent
  * point. This loop is inherently sequential (each step mutates the tree) and
  * runs on the driver — the very limitation the paper's thread-scaling
  * experiment demonstrates.
  */
object ExDPC extends DPCAlgorithm {
  override val name = "Ex-DPC"

  override def run(spark: SparkSession, pts: Pts, params: DPCParams): DPCResult = {
    val n = pts.n

    val t0   = System.nanoTime()
    val tree = new KdTree(pts).buildAll()
    val bcPts  = spark.sparkContext.broadcast(pts)
    val bcTree = spark.sparkContext.broadcast(tree)
    import spark.implicits._
    val rhoOut = Par.mapIndexed[(Int, Double)](spark, n) { idxs =>
      val p = bcPts.value
      val t = bcTree.value
      idxs.iterator.map { i =>
        val cnt = t.rangeCount(p.point(i), params.dcut) - 1 // exclude the point itself
        (i, cnt + Jitter.frac(i))
      }
    }
    val rho = new Array[Double](n)
    rhoOut.foreach { case (i, r) => rho(i) = r }
    val memDensity = tree.memBytes
    bcPts.destroy(); bcTree.destroy()
    val t1 = System.nanoTime()

    // Sequential incremental phase (driver = the single thread of §3).
    val order = Array.tabulate(n)(identity).sortBy(i => -rho(i))
    val inc   = new KdTree(pts)
    val depId = new Array[Int](n)
    val delta = new Array[Double](n)
    var r = 0
    while (r < n) {
      val i = order(r)
      if (r == 0) { depId(i) = -1; delta(i) = Double.PositiveInfinity }
      else {
        val (q, dd) = inc.nearest(pts.point(i))
        depId(i) = q
        delta(i) = dd
      }
      inc.insert(i)
      r += 1
    }
    val t2 = System.nanoTime()

    new DPCResult(rho, depId, delta,
      PhaseTimes((t1 - t0) / 1000000L, (t2 - t1) / 1000000L),
      math.max(memDensity, inc.memBytes))
  }
}
