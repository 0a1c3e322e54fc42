package repro.bench

import repro.SparkSpec
import repro.tables.Tables

/** Paper Table 5: inference efficiency on the User-User Graph —
  * Original (GraphFlat for every node + full model per GraphFeature) vs
  * GraphInfer (sliced message passing, each embedding computed once).
  *
  * Shape assertions: GraphInfer is faster (paper: 4423s vs 18214s, ~4×),
  * does strictly less embedding computation (paper: −50% CPU), materializes
  * fewer records (paper: −76% memory), and both paths agree on the scores
  * (unbiased inference).
  */
class Table5InferenceBench extends SparkSpec {

  test("Table 5: Original vs GraphInfer on uug-lite") {
    val r = Tables.table5(spark, BenchUtil.quick)
    BenchUtil.record("table5", Tables.fmtTable5(r))

    assert(r.maxScoreDiff < 1e-6,
      s"GraphInfer and Original disagree: max diff ${r.maxScoreDiff}")
    assert(r.graphInferMs < r.originalMs,
      s"GraphInfer (${r.graphInferMs}ms) should beat Original (${r.originalMs}ms)")
    assert(r.originalEmbComputations > 2 * r.graphInferEmbComputations,
      s"Original should recompute embeddings heavily " +
        s"(${r.originalEmbComputations} vs ${r.graphInferEmbComputations})")
    assert(r.originalNodeRecords > 2 * r.graphInferNodeRecords,
      "Original should materialize many more subgraph node records")
    assert(r.nodes > 0)
  }
}
