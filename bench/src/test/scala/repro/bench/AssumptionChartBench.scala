package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.{Experiments, Tables}

/** Reproduces Table 1 (the assumption comparison chart) behaviourally:
  * a system "needs" an assumption iff it fails a probe dataset violating
  * exactly that assumption while handling the control dataset.
  *
  * Paper's chart: Coverage Threshold — RB No / DM Yes; Non-overlapping —
  * Yes / Yes; Structural Form — Yes / Yes; Boundary — Yes / No;
  * Tokenization — Yes / No.
  */
class AssumptionChartBench extends AnyFunSuite {

  test("Table 1: assumption comparison chart") {
    val (rows, dmCtrl, rbCtrl) = Experiments.assumptionChart()
    println(s"control dataset: DM=${if (dmCtrl) "ok" else "FAIL"} RB=${if (rbCtrl) "ok" else "FAIL"}")
    println(Tables.render("Table 1 (paper: Cov No/Yes, Non-ovl Yes/Yes, Form Yes/Yes, Bnd Yes/No, Tok Yes/No)",
      Vector("assumption", "probe", "RecordBreaker", "Datamaran"),
      rows.map(r => Vector(r.assumption, r.probe,
        if (r.rbNeedsIt) "Yes" else "No",
        if (r.dmNeedsIt) "Yes" else "No"))))

    assert(dmCtrl && rbCtrl, "both systems must handle the control dataset")
    def row(a: String) = rows.find(_.assumption == a).get
    assert(row("Coverage Threshold").dmNeedsIt, "DM enforces the alpha threshold")
    assert(row("Boundary").rbNeedsIt && !row("Boundary").dmNeedsIt)
    assert(row("Tokenization").rbNeedsIt && !row("Tokenization").dmNeedsIt)
  }
}
