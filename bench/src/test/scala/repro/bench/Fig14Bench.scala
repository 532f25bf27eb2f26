package repro.bench

import repro.SparkSpec

/** Paper Figure 14b (tabular in the text): transformation share of the
  * library-delegation backend for ADD/EMU/MMU/QQR/DSV/VSV.
  */
class Fig14Bench extends SparkSpec {

  test("Figure 14b: data transformation share, 100K-500K rows x 50 columns") {
    val results = Fig14.run(spark)
    BenchUtil.report("fig14", Fig14.reportTable(results))
    assert(results.length == 18)
    assert(results.forall(r => r.sharePct >= 0 && r.sharePct <= 100))
    // Paper shape: for simple ops (ADD/EMU) the copy dominates; for complex
    // ops (QQR) the matrix computation takes a clearly larger share.
    for (rk <- Seq(100, 300, 500)) {
      val add = results.find(r => r.rowsK == rk && r.op == "ADD").get.sharePct
      val qqr = results.find(r => r.rowsK == rk && r.op == "QQR").get.sharePct
      assert(add > qqr, f"at ${rk}K rows: ADD share $add%.0f%% should exceed QQR share $qqr%.0f%%")
    }
  }
}
