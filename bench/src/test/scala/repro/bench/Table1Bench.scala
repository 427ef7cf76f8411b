package repro.bench

import repro.SparkSpec

/** Reproduces paper Table 1: the share and absolute cost of valid-candidate
  * computation + maximality verification (CM) in FilterV, vs VFree's CM
  * cost, on the D14 stand-in at the paper's four parameter settings.
  *
  * Shape targets (paper): FilterV-CM dominates FilterV's runtime
  * (85–89 %) and VFree-CM is an order of magnitude below FilterV-CM.
  */
class Table1Bench extends SparkSpec {

  test("Table 1 — FilterV vs VFree CM cost on D14 stand-in") {
    val rows = Tables.table1(spark, budgetMs = 300000)
    println(Tables.renderTable1(rows))
    for (r <- rows) {
      assert(r.vfreeCmSec >= 0 && r.filterVCmSec >= 0)
      // shape: CM dominates FilterV (paper: 85–88%), and VFree's CM cost is
      // well below FilterV's (paper: 10–27×; require ≥ 2×)
      assert(r.filterVCmShare > 50.0,
        s"${r.params}: CM share ${r.filterVCmShare}%% unexpectedly small")
      assert(r.vfreeCmSec <= r.filterVCmSec / 2.0,
        s"${r.params}: VFree-CM ${r.vfreeCmSec}s not ≤ half of FilterV-CM ${r.filterVCmSec}s")
    }
  }
}
