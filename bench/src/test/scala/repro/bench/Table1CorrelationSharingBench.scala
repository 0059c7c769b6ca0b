package repro.bench

import repro.eval.Tables

/** Table 1: cosine(S_M, S_U) vs cosine(R_M, R_U) using ground truth —
  * the empirical premise of correlation sharing (§3.1).
  */
class Table1CorrelationSharingBench extends BenchBase {

  private val paperCov  = Map("FZ" -> 0.76, "DA" -> 0.69, "DS" -> 0.74, "AB" -> 0.92, "AG" -> 0.73)
  private val paperCorr = Map("FZ" -> 0.97, "DA" -> 0.94, "DS" -> 0.98, "AB" -> 0.99, "AG" -> 0.99)

  test("Table 1: correlation matrices agree across classes more than covariances") {
    banner("TABLE 1 — cosine(S_M,S_U) vs cosine(R_M,R_U), paper values in parens")
    printRow(Seq("dataset", "cos(S_M,S_U)", "paper", "cos(R_M,R_U)", "paper"))
    val rows = Tables.table1(spark, scale)
    rows.foreach { r =>
      printRow(Seq(r.dataset, fmt(r.cosCov), fmt(paperCov(r.dataset)),
                   fmt(r.cosCorr), fmt(paperCorr(r.dataset))))
    }
    // Shape assertions: sharing correlations is justified, sharing
    // covariances is not — on every dataset.
    rows.foreach { r =>
      assert(r.cosCorr > r.cosCov,
        s"${r.dataset}: cos(R)=${r.cosCorr} should exceed cos(S)=${r.cosCov}")
      assert(r.cosCorr > 0.8, s"${r.dataset}: cos(R)=${r.cosCorr} should be near 1")
    }
  }
}
