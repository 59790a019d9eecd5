package repro.exp

import org.apache.spark.sql.SparkSession
import repro.cfsfdp.CFSFDPA
import repro.core._
import repro.data.Datasets
import repro.lsh.LSHDDP

/** Reproduction of every table in the paper's evaluation (§6). Each method
  * runs the experiment and returns the formatted rows, printing the paper's
  * published numbers next to ours so the shapes can be diffed (absolute times
  * differ: our substrate is Spark tasks on a container, not 12 Xeon threads —
  * see EXPERIMENTS.md).
  */
object Tables {

  private def fmt(v: Double): String = f"$v%.3f"

  private def banner(title: String): String =
    "\n" + "=" * 78 + s"\n$title\n" + "=" * 78

  // ------------------------------------------------------------------
  // Table 2: Rand index vs noise rate on Syn
  // ------------------------------------------------------------------
  val table2Paper: Map[Double, (Double, Double, Double)] = Map(
    0.01 -> (0.999, 1.000, 0.995),
    0.02 -> (0.980, 0.984, 0.980),
    0.04 -> (0.979, 0.983, 0.983),
    0.08 -> (0.981, 0.982, 0.982),
    0.16 -> (0.969, 0.976, 0.970)
  )

  def table2(spark: SparkSession): Seq[String] = {
    val rows = Seq(0.01, 0.02, 0.04, 0.08, 0.16).map { noise =>
      val prep = Harness.prepare(spark, Datasets.syn(noise), Harness.scaled(20000))
      val lsh  = Harness.measure(spark, prep, LSHDDP)
      val apx  = Harness.measure(spark, prep, ApproxDPC)
      val sap  = Harness.measure(spark, prep.copy(params = prep.params.copy(epsilon = 1.0)), SApproxDPC)
      val (pL, pA, pS) = table2Paper(noise)
      f"$noise%.2f | ${fmt(lsh.randIndex)} (paper $pL%.3f) | ${fmt(apx.randIndex)} (paper $pA%.3f) | ${fmt(sap.randIndex)} (paper $pS%.3f)"
    }
    val header = Seq(
      banner("Table 2: Rand index of LSH-DDP, Approx-DPC, S-Approx-DPC on Syn vs noise rate"),
      "noise | LSH-DDP | Approx-DPC | S-Approx-DPC (eps=1.0)"
    )
    header ++ rows
  }

  // ------------------------------------------------------------------
  // Table 3: Rand index on S1..S4 (cluster overlap)
  // ------------------------------------------------------------------
  val table3Paper: Map[Int, (Double, Double, Double)] = Map(
    1 -> (0.996, 1.000, 0.999),
    2 -> (0.994, 0.998, 0.996),
    3 -> (0.989, 0.999, 0.988),
    4 -> (0.979, 0.990, 0.981)
  )

  def table3(spark: SparkSession): Seq[String] = {
    val rows = (1 to 4).map { x =>
      val prep = Harness.prepare(spark, Datasets.sSet(x), Harness.scaled(20000))
      val lsh  = Harness.measure(spark, prep, LSHDDP)
      val apx  = Harness.measure(spark, prep, ApproxDPC)
      val sap  = Harness.measure(spark, prep.copy(params = prep.params.copy(epsilon = 1.0)), SApproxDPC)
      val (pL, pA, pS) = table3Paper(x)
      f"S$x | ${fmt(lsh.randIndex)} (paper $pL%.3f) | ${fmt(apx.randIndex)} (paper $pA%.3f) | ${fmt(sap.randIndex)} (paper $pS%.3f)"
    }
    Seq(
      banner("Table 3: Rand index on S1..S4 (increasing cluster overlap)"),
      "set | LSH-DDP | Approx-DPC | S-Approx-DPC (eps=1.0)"
    ) ++ rows
  }

  // ------------------------------------------------------------------
  // Table 4: Rand index of LSH-DDP and Approx-DPC on real stand-ins
  // ------------------------------------------------------------------
  val table4Paper: Map[String, (Double, Double)] = Map(
    "Airline"   -> (0.938, 0.999),
    "Household" -> (0.983, 0.996),
    "PAMAP2"    -> (0.951, 0.996),
    "Sensor"    -> (0.902, 0.960)
  )

  def table4(spark: SparkSession): Seq[String] = {
    val rows = Datasets.real.map { spec =>
      val prep = Harness.prepare(spark, spec, Harness.scaled(spec.defaultN))
      val lsh  = Harness.measure(spark, prep, LSHDDP)
      val apx  = Harness.measure(spark, prep, ApproxDPC)
      val (pL, pA) = table4Paper(spec.name)
      f"${spec.name}%-9s | ${fmt(lsh.randIndex)} (paper $pL%.3f) | ${fmt(apx.randIndex)} (paper $pA%.3f)"
    }
    Seq(
      banner("Table 4: Rand index of LSH-DDP and Approx-DPC on real-dataset stand-ins"),
      "dataset   | LSH-DDP | Approx-DPC"
    ) ++ rows
  }

  // ------------------------------------------------------------------
  // Table 5: running time vs accuracy of S-Approx-DPC over epsilon
  // ------------------------------------------------------------------
  val table5Paper: Map[(String, Double), (Double, Double)] = Map(
    ("Airline", 0.2)   -> (32.178, 0.998),
    ("Airline", 0.4)   -> (29.992, 0.996),
    ("Airline", 0.6)   -> (25.935, 0.985),
    ("Airline", 0.8)   -> (20.401, 0.976),
    ("Airline", 1.0)   -> (16.449, 0.969),
    ("Household", 0.2) -> (59.597, 0.995),
    ("Household", 0.4) -> (27.637, 0.994),
    ("Household", 0.6) -> (16.470, 0.994),
    ("Household", 0.8) -> (11.097, 0.993),
    ("Household", 1.0) -> (7.527, 0.991)
  )

  def table5(spark: SparkSession): Seq[String] = {
    val out = scala.collection.mutable.ArrayBuffer(
      banner("Table 5: running time [sec] vs Rand index of S-Approx-DPC over epsilon"),
      "dataset   | eps | time(s) | Rand index"
    )
    Seq(Datasets.airline, Datasets.household).foreach { spec =>
      val prep = Harness.prepare(spark, spec, Harness.scaled(spec.defaultN))
      Seq(0.2, 0.4, 0.6, 0.8, 1.0).foreach { eps =>
        val st = Harness.measure(spark, prep.copy(params = prep.params.copy(epsilon = eps)), SApproxDPC, reps = 3)
        val (pT, pR) = table5Paper((spec.name, eps))
        out += f"${spec.name}%-9s | $eps%.1f | ${st.totalSec}%7.3f (rho ${st.densitySec}%.2f, delta ${st.dependentSec}%.2f; paper $pT%7.3f) | ${fmt(st.randIndex)} (paper $pR%.3f)"
      }
    }
    out.toSeq
  }

  // ------------------------------------------------------------------
  // Table 6: decomposed rho / delta times for all algorithms
  // ------------------------------------------------------------------
  /** Paper's decomposed seconds: dataset -> algo -> (rho, delta). */
  val table6Paper: Map[String, Map[String, (Double, Double)]] = Map(
    "Airline" -> Map(
      "Scan" -> (15492.70, 17310.40), "R-tree + Scan" -> (128.28, 17310.40),
      "LSH-DDP" -> (90.54, 56.86), "CFSFDP-A" -> (13091.20, 17310.40),
      "Ex-DPC" -> (79.20, 129.56), "Approx-DPC" -> (25.09, 3.77), "S-Approx-DPC" -> (11.24, 1.16)
    ),
    "Household" -> Map(
      "Scan" -> (1703.37, 3989.77), "R-tree + Scan" -> (174.82, 3989.77),
      "LSH-DDP" -> (225.69, 414.37), "CFSFDP-A" -> (850.34, 3989.77),
      "Ex-DPC" -> (67.27, 182.47), "Approx-DPC" -> (22.12, 8.66), "S-Approx-DPC" -> (7.92, 0.74)
    ),
    "PAMAP2" -> Map(
      "Scan" -> (6114.82, 13717.60), "R-tree + Scan" -> (36.76, 13717.60),
      "LSH-DDP" -> (99.67, 98.38), "CFSFDP-A" -> (776.94, 13717.60),
      "Ex-DPC" -> (36.68, 97.45), "Approx-DPC" -> (18.88, 12.29), "S-Approx-DPC" -> (6.08, 0.72)
    ),
    "Sensor" -> Map(
      "Scan" -> (492.60, 1178.27), "R-tree + Scan" -> (304.10, 1178.27),
      "LSH-DDP" -> (148.84, 358.84), "CFSFDP-A" -> (127.89, 1178.27),
      "Ex-DPC" -> (89.93, 5.40), "Approx-DPC" -> (14.72, 1.58), "S-Approx-DPC" -> (3.56, 0.27)
    )
  )

  /** Table 6/7 epsilon defaults per dataset (paper §6.1, from Table 5). */
  val epsDefault: Map[String, Double] =
    Map("Airline" -> 0.8, "Household" -> 0.8, "PAMAP2" -> 0.8, "Sensor" -> 0.6)

  def allAlgorithms: Seq[DPCAlgorithm] =
    Seq(ScanDPC, RTreeScanDPC, LSHDDP, CFSFDPA, ExDPC, ApproxDPC, SApproxDPC)

  def table6(spark: SparkSession): Seq[String] = {
    val out = scala.collection.mutable.ArrayBuffer(
      banner("Table 6: decomposed time [sec] (rho comp. | delta comp.) at default parameters"),
      "dataset   | algorithm     | rho(s) | delta(s) | paper rho | paper delta"
    )
    Datasets.real.foreach { spec =>
      val prep0 = Harness.prepare(spark, spec, Harness.scaled(spec.defaultN))
      val prep  = prep0.copy(params = prep0.params.copy(epsilon = epsDefault(spec.name)))
      allAlgorithms.foreach { algo =>
        val st = Harness.measure(spark, prep, algo)
        val (pr, pd) = table6Paper(spec.name)(algo.name)
        out += f"${spec.name}%-9s | ${algo.name}%-13s | ${st.densitySec}%6.2f | ${st.dependentSec}%8.2f | $pr%9.2f | $pd%11.2f"
      }
    }
    out.toSeq
  }

  // ------------------------------------------------------------------
  // Table 7: memory usage [MB]
  // ------------------------------------------------------------------
  val table7Paper: Map[String, Map[String, Double]] = Map(
    "Airline" -> Map("R-tree + Scan" -> 564, "LSH-DDP" -> 2061, "CFSFDP-A" -> 59362,
      "Ex-DPC" -> 461, "Approx-DPC" -> 1316, "S-Approx-DPC" -> 1410),
    "Household" -> Map("R-tree + Scan" -> 346, "LSH-DDP" -> 756, "CFSFDP-A" -> 12601,
      "Ex-DPC" -> 171, "Approx-DPC" -> 422, "S-Approx-DPC" -> 482),
    "PAMAP2" -> Map("R-tree + Scan" -> 277, "LSH-DDP" -> 1455, "CFSFDP-A" -> 32206,
      "Ex-DPC" -> 321, "Approx-DPC" -> 790, "S-Approx-DPC" -> 884),
    "Sensor" -> Map("R-tree + Scan" -> 133, "LSH-DDP" -> 342, "CFSFDP-A" -> 3900,
      "Ex-DPC" -> 93, "Approx-DPC" -> 201, "S-Approx-DPC" -> 216)
  )

  def table7Algorithms: Seq[DPCAlgorithm] =
    Seq(RTreeScanDPC, LSHDDP, CFSFDPA, ExDPC, ApproxDPC, SApproxDPC)

  def table7(spark: SparkSession): Seq[String] = {
    val out = scala.collection.mutable.ArrayBuffer(
      banner("Table 7: modelled memory usage [MB] of the algorithms' data structures"),
      "dataset   | algorithm     | mem(MB) | paper(MB)"
    )
    Datasets.real.foreach { spec =>
      // Memory is modelled, not timed — half scale keeps this table cheap.
      val prep0 = Harness.prepare(spark, spec, Harness.scaled(spec.defaultN) / 2)
      val prep  = prep0.copy(params = prep0.params.copy(epsilon = epsDefault(spec.name)))
      table7Algorithms.foreach { algo =>
        val st = Harness.measure(spark, prep, algo)
        val pm = table7Paper(spec.name)(algo.name)
        out += f"${spec.name}%-9s | ${algo.name}%-13s | ${st.memMB}%7.1f | $pm%9.0f"
      }
    }
    out.toSeq
  }
}
