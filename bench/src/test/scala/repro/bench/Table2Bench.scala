package repro.bench

import repro.SparkSpec

/** Reproduces paper Table 2: statistics of all 15 datasets (synthetic
  * stand-ins, with the paper's originals printed alongside). |T| and the
  * default parameters match the paper exactly; |U|, |V|, |E| are the paper
  * values divided by the documented per-dataset scale factor.
  */
class Table2Bench extends SparkSpec {

  test("Table 2 — dataset statistics") {
    val rows = Tables.table2(spark)
    println(Tables.renderTable2(rows))
    assert(rows.size == 15)
    for ((row, spec) <- rows.zip(Datasets.all)) {
      assert(row.nT <= spec.nT, s"${spec.name}: |T| ${row.nT} exceeds configured ${spec.nT}")
      assert(row.nT >= spec.nT / 2, s"${spec.name}: too few populated timestamps")
      assert(row.nU <= spec.nU + 1 && row.nV <= spec.nV + 1)
      // edge volume near the scaled paper target (duplicates collapse some)
      assert(row.nE >= spec.targetEdges / 2 && row.nE <= spec.targetEdges * 3 / 2,
        s"${spec.name}: |E| ${row.nE} far from target ${spec.targetEdges}")
    }
  }
}
