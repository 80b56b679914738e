package repro.bench

import repro.experiments.Figures

/** Figure 11 — CSV vs Parquet(-lite) filter scans on 1/10/20-column float
  * tables.
  *
  * Paper shape: Parquet wins substantially when the table is wide and the
  * filter selective (scan-bound, only one column touched); the advantage
  * shrinks as selectivity → 1 because responses are CSV either way and the
  * transfer becomes the bottleneck; with a single column the two formats are
  * comparable.
  */
class Fig11ParquetBench extends BenchBase {

  test("figure 11: csv vs parquet") {
    val fig = show(Figures.fig11(spark, floatRows))

    def ratio(cols: Int, sel: Double): Double =
      fig.runtime(s"cols=$cols sel=$sel", "csv") / fig.runtime(s"cols=$cols sel=$sel", "parquet")

    // Wide table + selective filter: Parquet clearly faster.
    assert(ratio(20, 0.0) > 4.0, s"20-col selective ratio ${ratio(20, 0.0)}")
    assert(ratio(10, 0.0) > 2.5, s"10-col selective ratio ${ratio(10, 0.0)}")
    // 1 column: no pruning advantage (compression only).
    assert(ratio(1, 0.0) < 2.0)
    // The advantage shrinks as more data passes the filter.
    assert(ratio(20, 0.0) > ratio(20, 1.0))
    assert(ratio(20, 1.0) < 2.5, s"at sel=1 transfer dominates, got ${ratio(20, 1.0)}")
    // Scan cost (dollars) reflects the pruned bytes.
    assert(fig(s"cols=20 sel=0.5", "parquet").cost.scan * 5 <
           fig(s"cols=20 sel=0.5", "csv").cost.scan)
  }
}
