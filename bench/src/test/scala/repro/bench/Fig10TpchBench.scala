package repro.bench

import repro.experiments.Figures

/** Figure 10 — baseline vs optimized PushdownDB on the four representative
  * operator queries and TPC-H Q1, Q3, Q6, Q14, Q17, Q19.
  *
  * Paper shape: optimized wins on every workload; geo-mean speedup 6.7x and
  * geo-mean cost reduction ~30%.
  */
class Fig10TpchBench extends BenchBase {

  test("figure 10: baseline vs optimized") {
    val fig = show(Figures.fig10(spark, benchSf))
    val workloads = fig.entries.map(_.config).distinct

    for (w <- workloads) {
      assert(fig.runtime(w, "optimized") < fig.runtime(w, "baseline"),
        s"$w: optimized not faster")
    }

    val (speedup, costRatio) = Figures.fig10Summary(fig)
    println(f"geo-mean speedup: $speedup%.2fx (paper: 6.7x)")
    println(f"geo-mean cost ratio opt/base: $costRatio%.2f (paper: 0.70)")
    assert(speedup > 3.0, f"geo-mean speedup only $speedup%.2f")
    assert(costRatio < 1.1, f"optimized costs $costRatio%.2fx of baseline")
  }
}
