package repro.bench

import repro.erdata.Datasets
import repro.eval.Tables

/** Table 5: ablations — each column replaces one ZeroER innovation with its
  * naive alternative (diag+shared covariance; uniform regularization;
  * post-processing transitivity under a duplicate-free assumption).
  */
class Table5AblationBench extends BenchBase {

  private val paper: Map[String, Map[String, Double]] = Map(
    "ZeroER"          -> Map("FZ" -> 1.00, "DA" -> 0.96, "DS" -> 0.86, "AB" -> 0.52, "AG" -> 0.48),
    "diag+share cov"  -> Map("FZ" -> 0.97, "DA" -> 0.96, "DS" -> 0.78, "AB" -> 0.08, "AG" -> 0.09),
    "uniform reg"     -> Map("FZ" -> 0.95, "DA" -> 0.36, "DS" -> 0.59, "AB" -> 0.07, "AG" -> 0.04),
    "post-processing" -> Map("FZ" -> 0.99, "DA" -> 0.97, "DS" -> 0.41, "AB" -> 0.45, "AG" -> 0.42),
  )

  test("Table 5: ablation analysis") {
    banner("TABLE 5 — ablations (measured / paper)")
    val rows = Datasets.names.map(n => Tables.table5Row(spark, n, scale))
    printRow("variant" +: Datasets.names :+ "avg" :+ "paper-avg")
    Tables.table5Columns.foreach { c =>
      val vals = rows.map(_.f1(c))
      val avg  = vals.sum / vals.size
      val pAvg = Datasets.names.map(paper(c)).sum / 5.0
      printRow(c +: rows.zip(vals).map { case (r, v) =>
        s"${fmt(v)}/${fmt(paper(c)(r.dataset))}" } :+ fmt(avg) :+ fmt(pAvg))
    }
    Tables.clear()

    // --- Shape assertions from §5.3 ---
    def avgOf(c: String) = rows.map(_.f1(c)).sum / rows.size
    val full = avgOf("ZeroER")
    Tables.table5Columns.drop(1).foreach { c =>
      assert(full >= avgOf(c) - 0.02,
        s"full ZeroER ($full) must beat or match ablation $c (${avgOf(c)})")
    }
    // post-processing hurts most on DS, where the duplicate-free
    // assumption is violated by construction
    val byName = rows.map(r => r.dataset -> r).toMap
    val dsDrop = byName("DS").f1("ZeroER") - byName("DS").f1("post-processing")
    assert(dsDrop > 0.05,
      s"DS must punish the duplicate-free post-processing assumption (drop=$dsDrop)")
  }
}
