package repro.bench

import repro.SparkSpec

/** Paper Table 4: add over wide relations (1000 tuples, 1K-10K attributes).
  * Full-width sweep like the paper; asserts completion at 10K attributes and
  * broadly increasing cost with width.
  */
class Table4Bench extends SparkSpec {

  test("Table 4: add over wide relations, 1K-10K application attributes") {
    val attrs = Seq(1000, 2000, 4000, 6000, 8000, 10000)
    val results = Table4.run(spark, attrs)
    BenchUtil.report("table4", Table4.reportTable(results))
    assert(results.length == attrs.length)
    assert(results.forall(_._2 > 0))
    // The paper's qualitative claim: thousands of attributes are handled,
    // runtime grows with width (compare widest vs narrowest).
    assert(results.last._2 > results.head._2,
      s"expected wider relations to cost more: $results")
  }
}
