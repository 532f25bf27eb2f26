package repro.bench

import repro.SparkSpec

/** Paper Table 6: qqr scalability, R vs RMA+ (plus the RMA+BAT fallback). */
class Table6Bench extends SparkSpec {

  test("Table 6: qqr on 0.5M/1M/2M rows x 10/40/70 attributes, R vs RMA+") {
    val results = Table6.run(spark)
    BenchUtil.report("table6", Table6.reportTable(results))
    assert(results.length == 9)
    // Paper shape: RMA+ (library delegation) beats the single-threaded R
    // analog on the matrix workloads overall; geometric mean of R/RMA+
    // speedups across the sweep must favour RMA+ at the larger sizes.
    val large = results.filter(r => r.rows >= 1000000L)
    val gmean = math.exp(large.map(r => math.log(r.rSec / r.rmaSec)).sum / large.length)
    assert(gmean > 1.0,
      f"expected RMA+ to win on geometric mean over the >=1M-row configs, got $gmean%.2fx")
    // Paper remark: the BAT Gram-Schmidt fallback is slower than the library.
    results.filter(_.batSec.isDefined).foreach { r =>
      assert(r.batSec.get > r.rmaSec * 0.5,
        s"BAT fallback unexpectedly much faster than the library at ${r.rows}x${r.attrs}")
    }
  }
}
