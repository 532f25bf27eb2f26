package repro.bench

import repro.SparkSpec

/** Paper Table 5: add over sparse relations (500K tuples = 1/10 paper scale,
  * 10 attributes, 0-100% zeros).
  */
class Table5Bench extends SparkSpec {

  test("Table 5: add over sparse relations, 0-100% zeros") {
    val results = Table5.run(spark, rows = 500000L)
    BenchUtil.report("table5", Table5.reportTable(results, 500000L))
    assert(results.length == Table5.paperZeroPct.length)
    assert(results.forall(_._2 > 0))
    // Sanity: the sweep completes on fully sparse input too.
    assert(results.last._1 == 100)
  }
}
