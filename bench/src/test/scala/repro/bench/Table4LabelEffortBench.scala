package repro.bench

import repro.erdata.Datasets
import repro.eval.Tables

/** Table 4: number of labeled examples each supervised / active learning
  * method needs to match ZeroER's F1 (asterisk = all pairs, never reaches).
  */
class Table4LabelEffortBench extends BenchBase {

  private val paper: Map[String, Map[String, String]] = Map(
    "LR"    -> Map("FZ" -> "2915*", "DA" -> "418", "DS" -> "413", "AB" -> "162981*", "AG" -> "358281*"),
    "RF"    -> Map("FZ" -> "2915*", "DA" -> "232", "DS" -> "227", "AB" -> "162981*", "AG" -> "7589"),
    "MLP"   -> Map("FZ" -> "2915*", "DA" -> "417", "DS" -> "270", "AB" -> "162981*", "AG" -> "358281*"),
    "DM"    -> Map("FZ" -> "2332", "DA" -> "4647", "DS" -> "6768", "AB" -> "16865", "AG" -> "17916"),
    "AL-RF" -> Map("FZ" -> "1572", "DA" -> "26", "DS" -> "33", "AB" -> "162981*", "AG" -> "358281*"),
  )

  test("Table 4: labels needed to match ZeroER") {
    banner("TABLE 4 — #labels to match ZeroER's F1 (measured / paper; * = never)")
    val rows = Datasets.names.map(n => Tables.table4Row(spark, n, scale))
    printRow("method" +: Datasets.names)
    val methods = Seq("LR", "RF", "MLP", "DM", "AL-RF")
    methods.foreach { m =>
      printRow(m +: rows.map { r =>
        val got = r.labels(m).map(_.toString).getOrElse(s"${r.total}*")
        s"$got/${paper(m)(r.dataset)}"
      })
    }
    println(s"\nZeroER target F1 per dataset: " +
      rows.map(r => s"${r.dataset}=${fmt(r.target)}").mkString("  "))

    // --- Shape assertions ---
    rows.foreach { r =>
      r.labels.foreach { case (m, n) =>
        n.foreach { k =>
          assert(k > 0 && k <= r.total, s"${r.dataset}/$m budget $k out of range")
          // matching a zero-label method costs labels (or is impossible)
          assert(k >= 10, s"${r.dataset}/$m suspiciously free: $k labels")
        }
      }
    }
    // On the hard product datasets the budget should be large or unbounded,
    // for at least some of the classic supervised methods (paper: asterisks).
    val hardRows = rows.filter(r => r.dataset == "AB" || r.dataset == "AG")
    hardRows.foreach { r =>
      val unbounded = Seq("LR", "RF", "MLP").count(m =>
        r.labels(m).isEmpty || r.labels(m).exists(_ > r.total / 10))
      assert(unbounded >= 1, s"${r.dataset}: expected a large/unbounded budget, got ${r.labels}")
    }
  }
}
