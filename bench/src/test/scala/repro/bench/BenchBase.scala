package repro.bench

import repro.SparkSpec
import repro.experiments.Fig

/** Base for the figure benches: SF 0.1 TPC-H-lite data (~100 MB), synthetic
  * tables sized to match. Each suite prints its figure's table (captured in
  * bench_output.txt) and asserts the *shape* the paper reports — who wins,
  * by roughly what factor, where crossovers fall.
  */
trait BenchBase extends SparkSpec {
  /** TPC-H-lite scale factor for bench data. */
  val benchSf: Double = sys.env.getOrElse("REPRO_BENCH_SF", "0.1").toDouble
  /** Row count for the 20-column synthetic group-by tables (~25 MB). */
  val groupRows: Long = sys.env.getOrElse("REPRO_GROUP_ROWS", "200000").toLong
  /** Row count for the float tables of Figure 11. */
  val floatRows: Long = sys.env.getOrElse("REPRO_FLOAT_ROWS", "150000").toLong

  def show(fig: Fig): Fig = {
    println()
    println(fig.render)
    println()
    fig
  }
}
