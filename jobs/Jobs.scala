package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.experiments.Figures

/** spark-submit entrypoints, one per reproduced figure.
  *
  * {{{
  * spark-submit --class repro.jobs.Fig1Filter target/scala-2.13/repro_2.13-*.jar [sf]
  * }}}
  *
  * `sf` (TPC-H figures) defaults to 0.1; synthetic-table figures take a row
  * count (default 300000).
  */
object JobUtil {
  def session(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", "64")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  def sf(args: Array[String]): Double = args.headOption.map(_.toDouble).getOrElse(0.1)
  def rows(args: Array[String]): Long = args.headOption.map(_.toLong).getOrElse(300000L)
}

object Fig1Filter {
  def main(args: Array[String]): Unit =
    println(Figures.fig1(JobUtil.session("fig1"), JobUtil.sf(args)).render)
}

object Fig2JoinCustomer {
  def main(args: Array[String]): Unit =
    println(Figures.fig2(JobUtil.session("fig2"), JobUtil.sf(args)).render)
}

object Fig3JoinOrders {
  def main(args: Array[String]): Unit =
    println(Figures.fig3(JobUtil.session("fig3"), JobUtil.sf(args)).render)
}

object Fig4BloomFpr {
  def main(args: Array[String]): Unit =
    println(Figures.fig4(JobUtil.session("fig4"), JobUtil.sf(args)).render)
}

object Fig5GroupByUniform {
  def main(args: Array[String]): Unit =
    println(Figures.fig5(JobUtil.session("fig5"), JobUtil.rows(args)).render)
}

object Fig6HybridSplit {
  def main(args: Array[String]): Unit =
    println(Figures.fig6(JobUtil.session("fig6"), JobUtil.rows(args)).render)
}

object Fig7GroupBySkew {
  def main(args: Array[String]): Unit =
    println(Figures.fig7(JobUtil.session("fig7"), JobUtil.rows(args)).render)
}

object Fig8TopKSample {
  def main(args: Array[String]): Unit =
    println(Figures.fig8(JobUtil.session("fig8"), JobUtil.sf(args)).render)
}

object Fig9TopKSweep {
  def main(args: Array[String]): Unit =
    println(Figures.fig9(JobUtil.session("fig9"), JobUtil.sf(args)).render)
}

object Fig10Tpch {
  def main(args: Array[String]): Unit = {
    val fig = Figures.fig10(JobUtil.session("fig10"), JobUtil.sf(args))
    println(fig.render)
    val (speedup, costRatio) = Figures.fig10Summary(fig)
    println(f"geo-mean speedup: $speedup%.2fx   geo-mean cost ratio (opt/base): $costRatio%.2f")
  }
}

object Fig11Parquet {
  def main(args: Array[String]): Unit =
    println(Figures.fig11(JobUtil.session("fig11"), JobUtil.rows(args)).render)
}
