package repro.bench

import repro.erdata.Datasets
import repro.eval.Tables

/** Table 3: F-score of ZeroER vs 5 unsupervised, 4 supervised and 1 active
  * learning baseline on all five datasets. Runtimes (Figure 7's subject)
  * are printed alongside since they fall out of the same runs.
  */
class Table3FScoreBench extends BenchBase {

  private val paper: Map[String, Map[String, Double]] = Map(
    "ZeroER" -> Map("FZ" -> 1.00, "DA" -> 0.96, "DS" -> 0.86, "AB" -> 0.52, "AG" -> 0.48),
    "ECM"    -> Map("FZ" -> 0.07, "DA" -> 0.09, "DS" -> 0.07, "AB" -> 0.01, "AG" -> 0.01),
    "KM-RL"  -> Map("FZ" -> 0.30, "DA" -> 0.95, "DS" -> 0.85, "AB" -> 0.01, "AG" -> 0.02),
    "KM-SK"  -> Map("FZ" -> 0.30, "DA" -> 0.27, "DS" -> 0.43, "AB" -> 0.02, "AG" -> 0.02),
    "GMM"    -> Map("FZ" -> 0.30, "DA" -> 0.26, "DS" -> 0.07, "AB" -> 0.02, "AG" -> 0.02),
    "PP*"    -> Map("FZ" -> 0.97, "DA" -> 0.87, "DS" -> 0.83, "AB" -> 0.29, "AG" -> 0.30),
    "RF"     -> Map("FZ" -> 0.97, "DA" -> 0.98, "DS" -> 0.93, "AB" -> 0.46, "AG" -> 0.51),
    "LR"     -> Map("FZ" -> 0.98, "DA" -> 0.96, "DS" -> 0.88, "AB" -> 0.18, "AG" -> 0.18),
    "MLP"    -> Map("FZ" -> 0.99, "DA" -> 0.97, "DS" -> 0.92, "AB" -> 0.32, "AG" -> 0.35),
    "DM"     -> Map("FZ" -> 0.93, "DA" -> 0.97, "DS" -> 0.95, "AB" -> 0.63, "AG" -> 0.67),
    "AL-RF"  -> Map("FZ" -> 1.00, "DA" -> 0.99, "DS" -> 0.99, "AB" -> 0.44, "AG" -> 0.46),
  )

  test("Table 3: F-score for all methods on all datasets") {
    banner("TABLE 3 — F-score (measured / paper)")
    val rows = Datasets.names.map(n => Tables.table3Row(spark, n, scale))

    printRow("method" +: Datasets.names :+ "avg" :+ "paper-avg")
    Tables.table3Methods.foreach { m =>
      val vals = rows.map(r => r.f1(m))
      val avg  = vals.sum / vals.size
      val pAvg = Datasets.names.map(paper(m)).sum / 5.0
      printRow(m +: rows.map(r => s"${fmt(r.f1(m))}/${fmt(paper(m)(r.dataset))}")
        :+ fmt(avg) :+ fmt(pAvg))
    }
    println("\nRuntime (ms) per method and dataset — Figure 7's measurement:")
    printRow("method" +: Datasets.names)
    Tables.table3Methods.foreach { m =>
      printRow(m +: rows.map(r => r.ms(m).toString))
    }

    val byName = rows.map(r => r.dataset -> r).toMap
    def avgOf(m: String) = rows.map(_.f1(m)).sum / rows.size

    // --- Shape assertions from §5.2 ---
    // ZeroER greatly outperforms all five unsupervised baselines on average
    val zAvg = avgOf("ZeroER")
    for (u <- Seq("ECM", "KM-RL", "KM-SK", "GMM", "PP*"))
      assert(zAvg > avgOf(u), s"ZeroER avg $zAvg must beat $u avg ${avgOf(u)}")
    // ZeroER is comparable to supervised methods (within 0.15 of the best)
    val supBest = Seq("RF", "LR", "MLP", "DM").map(avgOf).max
    assert(zAvg > supBest - 0.15, s"ZeroER avg $zAvg vs best supervised $supBest")
    // clustering collapses on the hard product datasets
    for (d <- Seq("AB", "AG"); u <- Seq("KM-RL", "KM-SK", "GMM", "ECM"))
      assert(byName(d).f1(u) < byName(d).f1("ZeroER"),
        s"$u must lose to ZeroER on $d")
    // FZ is the easy dataset for ZeroER
    assert(byName("FZ").f1("ZeroER") > 0.9)
  }
}
