package repro.bench

import repro.eval.Tables

/** Table 2: dataset characteristics (#tuples, #matches, #attributes). */
class Table2DatasetStatsBench extends BenchBase {

  // paper: (left, right, matches); DS right is scaled down (DESIGN.md)
  private val paper = Map(
    "FZ" -> (533, 331, 112), "DA" -> (2616, 2294, 2224),
    "DS" -> (2616, 64263, 5347), "AB" -> (1082, 1093, 1097),
    "AG" -> (1363, 3226, 1300))

  test("Table 2: generated dataset statistics") {
    banner("TABLE 2 — dataset characteristics (paper sizes in parens)")
    printRow(Seq("dataset", "#left", "#right", "#match", "#attrs", "paper L-R-M"))
    val rows = Tables.table2(spark, scale)
    rows.foreach { r =>
      val (pl, pr, pm) = paper(r.dataset)
      printRow(Seq(r.dataset, r.nLeft.toString, r.nRight.toString,
                   r.nMatch.toString, r.nAttrs.toString, s"$pl-$pr-$pm"))
    }
    if (scale == 1.0) {
      val byName = rows.map(r => r.dataset -> r).toMap
      assert(byName("FZ").nLeft == 533 && byName("FZ").nRight == 331 && byName("FZ").nMatch == 112)
      assert(byName("DA").nLeft == 2616 && byName("DA").nRight == 2294)
      assert(byName("AG").nLeft == 1363 && byName("AG").nRight == 3226 && byName("AG").nMatch == 1300)
      // DS right table is intentionally scaled from 64k to ~8-9k
      assert(byName("DS").nRight > 6000 && byName("DS").nRight < 12000)
      assert(byName("DS").nMatch > byName("DS").nLeft - 700, "DS matches include right-side duplicates")
    }
    rows.foreach(r => assert(r.nMatch > 0 && r.nLeft > 0 && r.nRight > 0))
  }
}
