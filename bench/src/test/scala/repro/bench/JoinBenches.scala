package repro.bench

import repro.experiments.Figures

/** Figure 2 — join vs customer-side selectivity.
  *
  * Paper shape: baseline ≈ filtered (both move the whole orders table);
  * Bloom join significantly faster when the customer filter is selective,
  * degrading as selectivity drops; Bloom is cheapest at high selectivity.
  */
class Fig2JoinCustomerBench extends BenchBase {

  test("figure 2: join vs customer selectivity") {
    val fig = show(Figures.fig2(spark, benchSf))
    val accts = Seq("acct<=-950.0", "acct<=-850.0", "acct<=-750.0",
      "acct<=-650.0", "acct<=-550.0", "acct<=-450.0")

    // Bloom wins clearly at the selective end.
    assert(fig.runtime("acct<=-950.0", "baseline") > 3.0 * fig.runtime("acct<=-950.0", "bloom"))
    assert(fig.runtime("acct<=-950.0", "filtered") > 2.0 * fig.runtime("acct<=-950.0", "bloom"))
    // Baseline is flat across the sweep (it always moves everything).
    val base = accts.map(fig.runtime(_, "baseline"))
    assert(base.max / base.min < 1.5)
    // Bloom stays at least as fast as baseline everywhere.
    for (a <- accts) assert(fig.runtime(a, "bloom") <= fig.runtime(a, "baseline"))
    // Bloom is cheaper than baseline when selective.
    assert(fig.cost("acct<=-950.0", "bloom") < fig.cost("acct<=-950.0", "baseline"))
  }
}

/** Figure 3 — join vs orders-side selectivity.
  *
  * Paper shape: filtered join beats baseline when the orders filter is
  * selective and converges to it as the filter passes everything; Bloom join
  * stays fast and fairly constant.
  */
class Fig3JoinOrdersBench extends BenchBase {

  test("figure 3: join vs orders selectivity") {
    val fig = show(Figures.fig3(spark, benchSf))
    val first = "date<1992-03-01"
    val last  = "date<None"

    assert(fig.runtime(first, "filtered") * 2 < fig.runtime(first, "baseline"))
    // advantage shrinks as the filter passes more rows
    val advFirst = fig.runtime(first, "baseline") / fig.runtime(first, "filtered")
    val advLast  = fig.runtime(last, "baseline") / fig.runtime(last, "filtered")
    assert(advFirst > advLast)
    // Bloom fairly constant and never worse than baseline.
    val bloomTimes = Seq(first, "date<1993-01-01", last).map(fig.runtime(_, "bloom"))
    assert(bloomTimes.max / bloomTimes.min < 3.0)
    for (d <- Seq(first, "date<1993-01-01", last))
      assert(fig.runtime(d, "bloom") <= fig.runtime(d, "baseline"))
    // Bloom cost comparable or cheaper than baseline at the open end.
    assert(fig.cost(last, "bloom") < 1.5 * fig.cost(last, "baseline"))
  }
}

/** Figure 4 — Bloom join vs false-positive rate.
  *
  * Paper shape: best runtime/cost at FPR 0.01 — lower FPRs pay for bigger
  * filters (more S3-side hashing), higher FPRs pay for more returned rows.
  */
class Fig4BloomFprBench extends BenchBase {

  test("figure 4: bloom fpr sweep") {
    val fig = show(Figures.fig4(spark, benchSf))
    val sweep = Seq("fpr=1.0E-4", "fpr=0.001", "fpr=0.01", "fpr=0.1", "fpr=0.3", "fpr=0.5")
    val times = sweep.map(s => s -> fig.runtime(s, "bloom")).toMap

    // U-shape: the sweet spot is in the middle of the sweep.
    val best = sweep.minBy(times)
    assert(Set("fpr=0.001", "fpr=0.01", "fpr=0.1").contains(best), s"best at $best")
    assert(times("fpr=0.01") < times("fpr=1.0E-4"))
    assert(times("fpr=0.01") < times("fpr=0.5"))
    // Even the worst FPR beats the baseline join.
    assert(times.values.max < fig.runtime("ref", "baseline"))
  }
}
