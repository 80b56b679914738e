package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.s3._

/** Result of executing one operator strategy / query plan: the (real)
  * result rows, the measured per-phase IO metrics, and the modeled runtime
  * and dollar cost at paper scale.
  */
final case class PlanResult(
    df: DataFrame,
    phases: Vector[PhaseView],
    runtimeSeconds: Double,
    cost: CostBreakdown,
    info: Map[String, String] = Map.empty,
) {
  def bytesReturned: Long = phases.map(_.returnedBytes).sum
  def bytesScanned: Long  = phases.map(_.scannedBytes).sum
  def getRequests: Long   = phases.map(_.getRequests).sum
}

object Plans {

  /** Read a stored table through the `s3select` DataSource. */
  def read(spark: SparkSession, table: String, pushdown: Boolean = true,
           extraWhere: Option[String] = None): DataFrame = {
    val r = spark.read.format("s3select")
      .option("table", table)
      .option("pushdown", if (pushdown) "on" else "off")
    extraWhere.fold(r)(w => r.option("extraWhere", w)).load()
  }

  /** Force `df` inside the current phase so its scan metrics are recorded
    * exactly once; later actions hit the cache.
    */
  def force(df: DataFrame): DataFrame = {
    df.persist()
    df.count()
    df
  }

  /** Modeled runtime of a timeline: outer Seq = sequential stages, inner
    * Seq = phases running in parallel within a stage (max).
    */
  def runtimeOf(timeline: Seq[Seq[String]], scale: Double): Double = {
    timeline.map { par =>
      par.map(name => RuntimeModel.phaseSeconds(Sim.get(name), scale)).max
    }.sum
  }

  /** Snapshot phases + compute runtime/cost for the finished plan. */
  def finish(df: DataFrame, timeline: Seq[Seq[String]], scale: Double,
             info: Map[String, String] = Map.empty): PlanResult = {
    val runtime = runtimeOf(timeline, scale)
    val phases  = Sim.snapshot()
    PlanResult(df, phases, runtime, RuntimeModel.cost(phases, runtime, scale), info)
  }
}
