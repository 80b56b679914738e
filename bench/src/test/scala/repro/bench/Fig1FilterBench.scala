package repro.bench

import repro.experiments.Figures

/** Figure 1 — filter algorithms vs selectivity.
  *
  * Paper shape: S3-side filter ~10x faster than server-side across the whole
  * sweep; indexing matches S3-side when highly selective but degrades past
  * 1e-4; indexing is ~2.7x cheaper than server-side when selective; S3-side
  * is modestly (~24%) more expensive than server-side.
  */
class Fig1FilterBench extends BenchBase {

  test("figure 1: filter algorithms") {
    val fig = show(Figures.fig1(spark, benchSf))
    val sels = Seq("sel=1e-07", "sel=1e-06", "sel=1e-05", "sel=1e-04", "sel=1e-03", "sel=1e-02")

    // S3-side is much faster than server-side at every selectivity.
    for (s <- sels) {
      val ratio = fig.runtime(s, "server-side") / fig.runtime(s, "s3-side")
      assert(ratio > 4.0, s"$s: s3-side only ${ratio}x faster")
    }
    // ...and its runtime is flat across the sweep.
    val s3Times = sels.map(fig.runtime(_, "s3-side"))
    assert(s3Times.max / s3Times.min < 3.0)

    // Indexing ~ S3-side when highly selective; degrades once sel > 1e-4.
    assert(fig.runtime("sel=1e-07", "indexing") < 2.0 * fig.runtime("sel=1e-07", "s3-side"))
    assert(fig.runtime("sel=1e-02", "indexing") > 4.0 * fig.runtime("sel=1e-02", "s3-side"))
    assert(fig.runtime("sel=1e-02", "indexing") > fig.runtime("sel=1e-04", "indexing"))

    // Cost: indexing cheapest when selective; S3-side somewhat dearer than
    // server-side (paper: +24%).
    assert(fig.cost("sel=1e-07", "indexing") * 2 < fig.cost("sel=1e-07", "server-side"))
    val costRatio = fig.cost("sel=1e-03", "s3-side") / fig.cost("sel=1e-03", "server-side")
    assert(costRatio > 1.0 && costRatio < 2.5, s"s3/server cost ratio $costRatio")
    // Indexing cost grows rapidly with selectivity (HTTP requests).
    assert(fig.cost("sel=1e-02", "indexing") > 3.0 * fig.cost("sel=1e-02", "server-side"))
  }
}
