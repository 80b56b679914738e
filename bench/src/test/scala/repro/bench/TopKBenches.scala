package repro.bench

import repro.core.TopKOps
import repro.experiments.Figures
import repro.s3.S3Client

/** Figure 8 — sampling top-K vs sample size (K=100).
  *
  * Paper shape: phase-1 time grows with S, phase-2 time shrinks; total data
  * returned is U-shaped with its minimum near the model's
  * S* = sqrt(KN/alpha); runtime is best in the middle of the sweep.
  */
class Fig8TopKSampleBench extends BenchBase {

  test("figure 8: top-k sample size sweep") {
    val fig = show(Figures.fig8(spark, benchSf))
    val entries = fig.entries
    val n = new S3Client().tableRows("lineitem")
    val sOpt = TopKOps.optimalSampleSize(100, n, 0.1)

    def s(e: repro.experiments.Entry): Long =
      e.config.stripPrefix("S=").stripSuffix("(opt)").toLong
    val sorted = entries.sortBy(s)
    def info(e: repro.experiments.Entry, k: String) = e.r.info(k).toDouble

    // phase 1 grows with S, phase 2 shrinks with S
    assert(info(sorted.last, "phase1_s") > info(sorted.head, "phase1_s"))
    assert(info(sorted.head, "phase2_s") >= info(sorted.last, "phase2_s"))

    // data returned is minimized at (or next to) the model optimum
    val byReturned = entries.minBy(_.r.bytesReturned)
    val ratio = s(byReturned).toDouble / sOpt
    assert(ratio > 0.05 && ratio < 20, s"returned-bytes minimum at S=${s(byReturned)} vs S*=$sOpt")

    // extremes are not the best runtime
    val best = entries.minBy(_.runtime)
    assert(best.runtime <= sorted.head.runtime && best.runtime <= sorted.last.runtime)
    assert(fig.runtime(sorted.last.config, "sampling") > 1.2 * best.runtime,
      "oversampling should clearly hurt")
  }
}

/** Figure 9 — server-side vs sampling top-K as K grows.
  *
  * Paper shape: both grow with K; sampling is consistently faster and
  * cheaper than server-side.
  */
class Fig9TopKSweepBench extends BenchBase {

  test("figure 9: top-k vs K") {
    val fig = show(Figures.fig9(spark, benchSf))
    val ks = Seq("K=1", "K=10", "K=100", "K=1000", "K=10000")

    for (k <- ks) {
      assert(fig.runtime(k, "sampling") < fig.runtime(k, "server-side"),
        s"$k: sampling not faster")
      assert(fig.cost(k, "sampling") < fig.cost(k, "server-side"),
        s"$k: sampling not cheaper")
    }
    // runtime grows with K for the sampling algorithm
    assert(fig.runtime("K=10000", "sampling") > fig.runtime("K=1", "sampling"))
    // at small K the gap is large (most of the table never moves)
    assert(fig.runtime("K=1", "server-side") > 4.0 * fig.runtime("K=1", "sampling"))
  }
}
