package repro.bench

import repro.SparkSpec
import repro.tables.Tables

/** Paper Table 2: summary of datasets. Ours are the synthetic stand-ins
  * (see DESIGN §2); the assertion checks the *shape* mirrors the paper's
  * (Cora's exact split sizes, PPI's 24-graph structure, UUG's skew).
  */
class Table2DatasetsBench extends SparkSpec {

  test("Table 2: dataset summary") {
    val rows = Tables.table2(BenchUtil.quick)
    BenchUtil.record("table2", Tables.fmtTable2(rows))

    val cora = rows.find(_.dataset == "cora-lite").get
    assert(cora.nodes == 2708 && cora.classes == 7)
    assert(cora.train == 140 && cora.valN == 500 && cora.test == 1000)

    val ppi = rows.find(_.dataset == "ppi-lite").get
    assert(ppi.featDim == 50 && ppi.classes == 16)
    assert(ppi.train > ppi.valN && ppi.train > ppi.test)

    val uug = rows.find(_.dataset == "uug-lite").get
    assert(uug.classes == 1)
    assert(uug.edges > uug.nodes, "UUG-lite should be denser than 1 edge/node")
    assert(uug.train > uug.valN)
  }
}
