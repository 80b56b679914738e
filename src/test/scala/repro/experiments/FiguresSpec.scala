package repro.experiments

import repro.SparkSpec

/** Harness smoke tests: every figure runner executes end-to-end at a tiny
  * scale and produces a well-formed table. (The full-size runs with shape
  * assertions live in the bench project.)
  */
class FiguresSpec extends SparkSpec {

  private val sf = 0.01
  private val rows = 4000L

  private def wellFormed(fig: Fig, minEntries: Int): Unit = {
    assert(fig.entries.size >= minEntries)
    fig.entries.foreach { e =>
      assert(e.runtime > 0, s"${e.config}/${e.algo} runtime")
      assert(e.cost > 0, s"${e.config}/${e.algo} cost")
      assert(!e.runtime.isNaN && !e.cost.isNaN)
    }
    assert(fig.render.linesIterator.size >= fig.entries.size + 3)
  }

  test("fig1 runs at tiny scale") {
    wellFormed(Figures.fig1(spark, sf, sels = Seq(1e-4, 1e-2)), 6)
  }

  test("fig2 runs at tiny scale") {
    wellFormed(Figures.fig2(spark, sf, accts = Seq(-950, -450)), 6)
  }

  test("fig3 runs at tiny scale") {
    wellFormed(Figures.fig3(spark, sf, dates = Seq(Some("1993-01-01"), None)), 6)
  }

  test("fig4 runs at tiny scale") {
    wellFormed(Figures.fig4(spark, sf, fprs = Seq(0.01, 0.5)), 4)
  }

  test("fig5 runs at tiny scale") {
    wellFormed(Figures.fig5(spark, rows, groupCounts = Seq(2, 8)), 6)
  }

  test("fig6 runs at tiny scale") {
    wellFormed(Figures.fig6(spark, rows, pushCounts = Seq(0, 4, 8)), 3)
  }

  test("fig7 runs at tiny scale") {
    wellFormed(Figures.fig7(spark, rows, thetas = Seq(0.0, 1.3)), 6)
  }

  test("fig8 runs at tiny scale") {
    wellFormed(Figures.fig8(spark, sf), 4)
  }

  test("fig9 runs at tiny scale") {
    wellFormed(Figures.fig9(spark, sf, ks = Seq(1, 100)), 4)
  }

  test("fig10 runs at tiny scale and optimized wins on geo-mean") {
    val fig = Figures.fig10(spark, sf)
    wellFormed(fig, 20)
    val (speedup, costRatio) = Figures.fig10Summary(fig)
    assert(speedup > 1.5, f"speedup $speedup%.2f")
    assert(costRatio < 1.5, f"cost ratio $costRatio%.2f")
  }

  test("fig11 runs at tiny scale") {
    val fig = Figures.fig11(spark, 5000, colCounts = Seq(1, 10), sels = Seq(0.0, 1.0))
    wellFormed(fig, 8)
  }
}
