package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}

/** Specification of one evaluation dataset (see DESIGN.md §4 for the mapping
  * from the paper's datasets to these stand-ins).
  *
  * @param name    display name matching the paper's tables
  * @param d       dimensionality
  * @param defaultN points at "full" scale of this repo
  * @param k       number of planted density peaks (clusters)
  * @param dcut    default cutoff distance
  * @param rhoMin  default noise threshold
  */
final case class DatasetSpec(
    name: String,
    d: Int,
    defaultN: Int,
    k: Int,
    dcut: Double,
    rhoMin: Double,
    domain: Double,
    gen: (SparkSession, Int) => DataFrame
) {
  def generate(spark: SparkSession, n: Int = 0): DataFrame =
    gen(spark, if (n > 0) n else defaultN)
}

/** Registry of all evaluation datasets. */
object Datasets {

  /** Syn: 2-d, 13 density peaks, tunable uniform-noise rate (paper: random-walk
    * dataset of [17] with 100k points; here a 13-Gaussian mixture at 20k).
    */
  def syn(noiseRate: Double = 0.03): DatasetSpec = {
    val centers = PointGen.gridCenters(k = 13, d = 2, domain = 1e5, seed = 11L)
    val sigmas  = Array.tabulate(13)(i => 1500.0 + 150.0 * (i % 5))
    DatasetSpec(
      name = f"Syn(noise=$noiseRate%.2f)", d = 2, defaultN = 20000, k = 13,
      dcut = 1000.0, rhoMin = 10.0, domain = 1e5,
      gen = (spark, n) => PointGen.mixture(spark, n, 2, centers, sigmas, noiseRate, 1e5, seed = 21L)
    )
  }

  /** S1..S4: 2-d, 15 Gaussian clusters with increasing overlap (x = 1..4). */
  def sSet(x: Int): DatasetSpec = {
    require(x >= 1 && x <= 4, "S-sets are S1..S4")
    val centers = PointGen.gridCenters(k = 15, d = 2, domain = 1e5, seed = 31L)
    val sigma   = 1400.0 + 800.0 * x // S1 tight ... S4 strongly overlapping
    DatasetSpec(
      name = s"S$x", d = 2, defaultN = 20000, k = 15,
      dcut = 1000.0, rhoMin = 10.0, domain = 1e5,
      gen = (spark, n) =>
        PointGen.mixture(spark, n, 2, centers, Array.fill(15)(sigma), 0.005, 1e5, seed = 40L + x)
    )
  }

  /** Airline stand-in: 3-d, domain [0,1e6]^3 (paper: 5.81M flight records). */
  val airline: DatasetSpec = {
    val centers = PointGen.gridCenters(k = 20, d = 3, domain = 1e6, seed = 51L)
    val sigmas  = Array.tabulate(20)(i => 2000.0 + 220.0 * (i % 6))
    DatasetSpec(
      name = "Airline", d = 3, defaultN = 150000, k = 20,
      dcut = 1000.0, rhoMin = 10.0, domain = 1e6,
      gen = (spark, n) => PointGen.mixture(spark, n, 3, centers, sigmas, 0.01, 1e6, seed = 52L)
    )
  }

  /** Household stand-in: 4-d, domain [0,1e5]^4 (paper: 2.05M smart-meter rows). */
  val household: DatasetSpec = {
    val centers = PointGen.gridCenters(k = 12, d = 4, domain = 1e5, seed = 61L)
    val sigmas  = Array.tabulate(12)(i => 1200.0 + 120.0 * (i % 4))
    DatasetSpec(
      name = "Household", d = 4, defaultN = 100000, k = 12,
      dcut = 1000.0, rhoMin = 10.0, domain = 1e5,
      gen = (spark, n) => PointGen.mixture(spark, n, 4, centers, sigmas, 0.01, 1e5, seed = 62L)
    )
  }

  /** PAMAP2 stand-in: 4-d, domain [0,1e5]^4 (paper: 3.85M activity readings). */
  val pamap2: DatasetSpec = {
    val centers = PointGen.gridCenters(k = 25, d = 4, domain = 1e5, seed = 71L)
    val sigmas  = Array.tabulate(25)(i => 1000.0 + 90.0 * (i % 5))
    DatasetSpec(
      name = "PAMAP2", d = 4, defaultN = 120000, k = 25,
      dcut = 1000.0, rhoMin = 10.0, domain = 1e5,
      gen = (spark, n) => PointGen.mixture(spark, n, 4, centers, sigmas, 0.01, 1e5, seed = 72L)
    )
  }

  /** Sensor stand-in: 8-d, domain [0,1e5]^8 (paper: 0.93M gas-sensor rows,
    * dcut=5000; dcut scaled to keep rho_avg in the paper's regime).
    */
  val sensor: DatasetSpec = {
    val centers = PointGen.gridCenters(k = 10, d = 8, domain = 1e5, seed = 81L)
    val sigmas  = Array.tabulate(10)(i => 1900.0 + 160.0 * (i % 4))
    DatasetSpec(
      name = "Sensor", d = 8, defaultN = 75000, k = 10,
      dcut = 4000.0, rhoMin = 10.0, domain = 1e5,
      gen = (spark, n) => PointGen.mixture(spark, n, 8, centers, sigmas, 0.01, 1e5, seed = 82L)
    )
  }

  /** The four "real" stand-ins of Tables 4, 6, 7. */
  val real: Seq[DatasetSpec] = Seq(airline, household, pamap2, sensor)
}
