package repro.bench

import repro.experiments.Figures

/** Figure 5 — group-by vs number of groups (uniform sizes).
  *
  * Paper shape: server-side and filtered are flat in #groups; filtered is
  * ~1.64x faster than server-side (4 of 20 columns transferred); S3-side is
  * ~4x faster than filtered at few groups and degrades as groups grow.
  */
class Fig5GroupByUniformBench extends BenchBase {

  test("figure 5: group-by vs number of groups") {
    val fig = show(Figures.fig5(spark, groupRows))
    val gs = Seq("groups=2", "groups=4", "groups=8", "groups=16", "groups=32")

    val server = gs.map(fig.runtime(_, "server-side"))
    val filt   = gs.map(fig.runtime(_, "filtered"))
    assert(server.max / server.min < 1.2)
    assert(filt.max / filt.min < 1.2)
    // filtered beats server-side by a modest factor (paper 1.64x).
    val ratio = server.head / filt.head
    assert(ratio > 1.2 && ratio < 3.0, s"filtered speedup $ratio")
    // s3-side much faster at few groups…
    assert(fig.runtime("groups=2", "filtered") > 2.5 * fig.runtime("groups=2", "s3-side"))
    // …and degrades as the CASE expression grows.
    assert(fig.runtime("groups=32", "s3-side") > 1.5 * fig.runtime("groups=2", "s3-side"))
  }
}

/** Figure 6 — hybrid group-by: how many groups to aggregate at S3.
  *
  * Paper shape: pushing more groups raises the S3-side (Q1) bar and lowers
  * the server-side (Q2) bar; total = max of the two; best around 6–8 groups;
  * returned bytes fall monotonically with pushed groups.
  */
class Fig6HybridSplitBench extends BenchBase {

  test("figure 6: hybrid split sweep") {
    val fig = show(Figures.fig6(spark, groupRows))
    val sweep = (0 to 10).map(g => s"pushed=$g")

    def info(c: String, k: String): Double = fig(c, "hybrid").info(k).toDouble
    // Q1 (S3 side) grows with pushed groups; Q2 (server side) shrinks.
    assert(info("pushed=10", "s3agg_s") > info("pushed=1", "s3agg_s"))
    assert(info("pushed=10", "serveragg_s") < info("pushed=0", "serveragg_s"))
    // Returned bytes fall as more groups are pushed.
    assert(fig("pushed=10", "hybrid").bytesReturned < fig("pushed=0", "hybrid").bytesReturned)
    // Best total sits in the middle of the sweep, and beats pushing nothing.
    val best = sweep.minBy(fig.runtime(_, "hybrid"))
    val bestG = best.stripPrefix("pushed=").toInt
    assert(bestG >= 3 && bestG <= 9, s"best split at $best (paper: 6-8, interior)")
    assert(fig.runtime(best, "hybrid") < fig.runtime("pushed=0", "hybrid"))
  }
}

/** Figure 7 — group-by vs data skew.
  *
  * Paper shape: server-side and filtered are insensitive to skew; hybrid
  * beats filtered at high skew (θ=1.3) and roughly ties at uniform.
  */
class Fig7GroupBySkewBench extends BenchBase {

  test("figure 7: group-by vs skew") {
    val fig = show(Figures.fig7(spark, groupRows))
    val thetas = Seq("theta=0.0", "theta=0.4", "theta=0.8", "theta=1.1", "theta=1.3")

    val server = thetas.map(fig.runtime(_, "server-side"))
    val filt   = thetas.map(fig.runtime(_, "filtered"))
    assert(server.max / server.min < 1.2)
    assert(filt.max / filt.min < 1.2)
    // hybrid wins at high skew…
    assert(fig.runtime("theta=1.3", "hybrid") < fig.runtime("theta=1.3", "filtered"))
    // …and its advantage grows with skew.
    val advHigh = fig.runtime("theta=1.3", "filtered") / fig.runtime("theta=1.3", "hybrid")
    val advLow  = fig.runtime("theta=0.0", "filtered") / fig.runtime("theta=0.0", "hybrid")
    assert(advHigh > advLow)
  }
}
