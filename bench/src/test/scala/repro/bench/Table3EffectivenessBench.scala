package repro.bench

import repro.SparkSpec
import repro.tables.Tables

/** Paper Table 3: effectiveness of GCN/GraphSAGE/GAT trained with AGL vs the
  * in-memory full-graph baseline (PyG/DGL stand-in) on Cora-lite (accuracy),
  * PPI-lite (micro-F1) and UUG-lite (AUC; baseline OOMs in the paper, so AGL
  * only). Shape assertions: AGL is comparable to the baseline on the public
  * stand-ins, and GAT wins on UUG-lite.
  */
class Table3EffectivenessBench extends SparkSpec {

  test("Table 3: effectiveness across systems and models") {
    val rows = Tables.table3(spark, BenchUtil.quick)
    BenchUtil.record("table3", Tables.fmtTable3(rows))

    val byKey = rows.map(r => (r.dataset, r.model) -> r).toMap

    // public datasets: AGL trains to the same quality as the full-graph path
    for (m <- Seq("gcn", "sage", "gat")) {
      val cora = byKey(("cora-lite", m))
      assert(cora.agl > 0.55, s"cora $m AGL accuracy ${cora.agl}")
      assert(cora.agl > cora.baseline - 0.10,
        s"cora $m: AGL ${cora.agl} far below baseline ${cora.baseline}")
      val ppi = byKey(("ppi-lite", m))
      assert(ppi.agl > 0.55, s"ppi $m AGL micro-F1 ${ppi.agl}")
      assert(ppi.agl > ppi.baseline - 0.10,
        s"ppi $m: AGL ${ppi.agl} far below baseline ${ppi.baseline}")
    }

    // UUG: all models beat chance; attention wins (paper: GAT 0.867 vs GCN 0.681)
    val gcn = byKey(("uug-lite", "gcn")).agl
    val sage = byKey(("uug-lite", "sage")).agl
    val gat = byKey(("uug-lite", "gat")).agl
    assert(gcn > 0.55 && sage > 0.55 && gat > 0.55, s"uug AUCs $gcn $sage $gat")
    if (!BenchUtil.quick) {
      assert(gat > gcn + 0.02, s"GAT ($gat) should clearly beat GCN ($gcn) on uug-lite")
      assert(gat > sage - 0.01, s"GAT ($gat) should not trail GraphSAGE ($sage) on uug-lite")
    }
  }
}
