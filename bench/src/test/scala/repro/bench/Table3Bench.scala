package repro.bench

import repro.SparkSpec

/** Reproduces paper Table 3 (case study on D1 / MIMIC-III stand-in):
  * MFG surfaces the planted multimorbidity clusters, MSG returns coarse
  * over-merged static groups, MFB returns nothing (its biclique must repeat
  * with identical patients across λ snapshots).
  */
class Table3Bench extends SparkSpec {

  test("Table 3 — MFG vs MSG vs MFB case study") {
    val res = Tables.table3(spark)
    println(Tables.renderTable3(res))

    // MFG: all planted clusters recovered (possibly inside larger groups)
    for (cluster <- CaseStudy.plantedClusters)
      assert(res.mfg.exists(g => cluster.toSet.subsetOf(g)), s"missing cluster $cluster")

    // MFB: N/A, like the paper
    assert(res.mfb.isEmpty, s"unexpected MFB results: ${res.mfb.take(3)}")

    // MSG: non-empty and coarser (largest group at least as large as MFG's)
    assert(res.msg.nonEmpty)
    assert(res.msg.map(_.size).max >= res.mfg.map(_.size).max)
  }
}
