package repro.experiments

import repro.core.PlanResult
import repro.s3.RuntimeModel

/** One measured configuration of a figure: the sweep value, the algorithm,
  * and the executed plan (metrics + modeled runtime/cost).
  */
final case class Entry(config: String, algo: String, r: PlanResult) {
  def runtime: Double = r.runtimeSeconds
  def cost: Double    = r.cost.total
}

/** A reproduced figure = a table of entries, printable in the shape the
  * paper reports (runtime + cost breakdown per configuration).
  */
final case class Fig(title: String, entries: Seq[Entry]) {

  def apply(config: String, algo: String): PlanResult =
    entries.find(e => e.config == config && e.algo == algo)
      .getOrElse(throw new NoSuchElementException(s"$title: no entry ($config, $algo)"))
      .r

  def runtime(config: String, algo: String): Double = apply(config, algo).runtimeSeconds
  def cost(config: String, algo: String): Double    = apply(config, algo).cost.total

  def render: String = {
    val header = Seq("config", "algorithm", "runtime_s", "cost_$", "compute_$",
      "scan_$", "transfer_$", "request_$", "returned_MB", "info")
    val rows = entries.map { e =>
      Seq(
        e.config, e.algo,
        f"${e.r.runtimeSeconds}%.3f",
        f"${e.r.cost.total}%.5f",
        f"${e.r.cost.compute}%.5f",
        f"${e.r.cost.scan}%.5f",
        f"${e.r.cost.transfer}%.5f",
        f"${e.r.cost.request}%.5f",
        f"${e.r.bytesReturned / 1e6}%.2f",
        e.r.info.map { case (k, v) => s"$k=$v" }.mkString(" "),
      )
    }
    TableFmt.render(title, header, rows)
  }
}

object TableFmt {
  def render(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(r => r(i).length).max)
    def line(r: Seq[String]): String =
      r.zipWithIndex.map { case (c, i) => c.padTo(widths(i), ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (s"== $title" +: line(header) +: sep +: rows.map(line)).mkString("\n")
  }
}
