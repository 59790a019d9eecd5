package repro.exp

import repro.SparkSpec
import repro.core._
import repro.data.Datasets
import repro.lsh.LSHDDP

/** Experiment harness: threshold derivation, measurement plumbing, and
  * small-scale sanity of the table machinery.
  */
class HarnessSpec extends SparkSpec {

  lazy val prep: Prepared = Harness.prepare(spark, Datasets.syn(0.02), n = 3000)

  test("prepare derives deltaMin above dcut and finds the planted clusters") {
    assert(prep.params.deltaMin > prep.spec.dcut)
    val centers = Labels.centers(prep.exact, prep.params.rhoMin, prep.params.deltaMin)
    assert(centers.length === prep.spec.k, s"expected ${prep.spec.k} centers, got ${centers.length}")
  }

  test("measuring the exact algorithm against itself gives Rand index 1") {
    val st = Harness.measure(spark, prep, ExDPC)
    assert(st.randIndex === 1.0)
    assert(st.nCenters === prep.spec.k)
    assert(st.densitySec >= 0 && st.dependentSec >= 0)
  }

  test("Approx-DPC measures with the same centers (Theorem 4 end-to-end)") {
    val st = Harness.measure(spark, prep, ApproxDPC)
    assert(st.nCenters === prep.spec.k)
    assert(st.randIndex > 0.9)
  }

  test("S-Approx-DPC and LSH-DDP measure with high accuracy at small scale") {
    val sa = Harness.measure(spark, prep.copy(params = prep.params.copy(epsilon = 0.5)), SApproxDPC)
    assert(sa.randIndex > 0.75, s"S-Approx RI ${sa.randIndex}")
    val ls = Harness.measure(spark, prep, LSHDDP)
    assert(ls.randIndex > 0.6, s"LSH-DDP RI ${ls.randIndex}")
  }

  test("memory model ordering matches the paper's Table 7 shape") {
    val spec  = Datasets.household
    val p     = Harness.prepare(spark, spec, n = 3000)
    val pEps  = p.copy(params = p.params.copy(epsilon = 0.8))
    val ex    = Harness.measure(spark, pEps, ExDPC)
    val ap    = Harness.measure(spark, pEps, ApproxDPC)
    val sa    = Harness.measure(spark, pEps, SApproxDPC)
    val cf    = Harness.measure(spark, pEps, repro.cfsfdp.CFSFDPA)
    assert(cf.memMB > ap.memMB, "CFSFDP-A must dominate memory")
    assert(ap.memMB > ex.memMB, "grid algorithms cost more memory than Ex-DPC")
    assert(sa.memMB > ex.memMB)
  }

  test("paper constants tables are complete") {
    assert(Tables.table2Paper.size === 5)
    assert(Tables.table3Paper.size === 4)
    assert(Tables.table4Paper.size === 4)
    assert(Tables.table5Paper.size === 10)
    assert(Tables.table6Paper.values.forall(_.size === 7))
    assert(Tables.table7Paper.values.forall(_.size === 6))
    assert(Tables.allAlgorithms.map(_.name).toSet ===
      Tables.table6Paper("Airline").keySet)
  }

  test("scaled respects a floor") {
    assert(Harness.scaled(100) >= 500 || Harness.scale >= 1.0)
  }
}
