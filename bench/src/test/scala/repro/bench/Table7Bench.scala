package repro.bench

import repro.SparkSpec

/** Paper Table 7: add followed by a selection — RMA+ vs the array-join
  * engine (SciDB analog). The paper reports an order-of-magnitude gap.
  */
class Table7Bench extends SparkSpec {

  test("Table 7: add + selection, RMA+ vs coordinate array join") {
    val results = Table7.run(spark)
    BenchUtil.report("table7", Table7.reportTable(results))
    assert(results.length == 4)
    // Paper shape: the array join makes the array engine clearly slower.
    // Robust criterion on a shared box: geometric-mean slowdown over the
    // sweep must exceed 1 (paper: 10-17.6x).
    val gmean = math.exp(results.map(r => math.log(r.arraySec / r.rmaSec)).sum / results.length)
    assert(gmean > 1.0,
      f"expected the array join to lose on geometric mean, got $gmean%.2fx")
  }
}
