package repro.bench

import repro.SparkSpec

/** Reproduces the two ErrorLog rows of **Table 2**.
  * Paper (ErrLog-Int): 100% / 5.6% (BU+) / 3.1% / 0.4%.
  * Paper (ErrLog-Ext): 100% / 12.2% (BU+) / 1.7% / 0.2%.
  */
class Table2ErrorLogBench extends SparkSpec {

  lazy val intRun = BenchData.intRun
  lazy val extRun = BenchData.extRun
  def frac(run: repro.harness.Table2.RunResult, scheme: String): Double =
    run.schemes.find(_.scheme == scheme).get.accessPercent

  test("print Table 2 row: ErrorLog-Int") {
    println(BenchData.renderWithPaper(intRun))
  }

  test("print Table 2 row: ErrorLog-Ext") {
    println(BenchData.renderWithPaper(extRun))
  }

  test("Int shape: range baseline accesses ~everything (paper: 100%)") {
    assert(frac(intRun, "Baseline") > 60.0, intRun.render)
  }

  test("Int shape: Greedy accesses a tiny fraction (paper: 3.1%)") {
    assert(frac(intRun, "Greedy") < 15.0, intRun.render)
    assert(frac(intRun, "Greedy") < frac(intRun, "Baseline") / 5)
  }

  test("Int shape: qd-trees beat BottomUp+") {
    assert(frac(intRun, "Greedy") < frac(intRun, "BottomUp+"), intRun.render)
    assert(frac(intRun, "RL") < frac(intRun, "BottomUp+"), intRun.render)
  }

  test("Ext shape: range baseline accesses ~everything (paper: 100%)") {
    assert(frac(extRun, "Baseline") > 60.0, extRun.render)
  }

  test("Ext shape: Greedy accesses a tiny fraction (paper: 1.7%)") {
    assert(frac(extRun, "Greedy") < 15.0, extRun.render)
  }

  test("Ext shape: qd-trees beat BottomUp+") {
    assert(frac(extRun, "Greedy") < frac(extRun, "BottomUp+"), extRun.render)
    assert(frac(extRun, "RL") < frac(extRun, "BottomUp+"), extRun.render)
  }
}
