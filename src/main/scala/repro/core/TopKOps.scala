package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.s3._
import Plans._

/** The top-K algorithms of §VII over
  * `SELECT * FROM t ORDER BY col ASC LIMIT K`.
  */
object TopKOps {

  /** Paper's optimal sample size `S = sqrt(K*N/alpha)` (§VII-B). */
  def optimalSampleSize(k: Long, n: Long, alpha: Double): Long =
    math.max(k + 1, math.round(math.sqrt(k.toDouble * n / alpha)))

  /** Server-side top-K: full transfer, heap at the server. */
  def serverSide(spark: SparkSession, table: String, col: String, k: Int,
                 scale: Double): PlanResult = {
    Sim.reset()
    val client = new S3Client()
    val n = client.tableRows(table)
    val df = Sim.inPhase("load") {
      force(read(spark, table, pushdown = false).orderBy(asc(col)).limit(k))
    }
    // every transferred row is pushed through the server-side heap
    Sim.phase("load").localWork(n, Model.RowHash)
    Sim.phase("load").localSeconds.add(n * Model.RowSortPerLog * log2(k + 1))
    finish(df, Seq(Seq("load")), scale)
  }

  /** Sampling-based top-K (§VII-A): phase 1 reads the first S records'
    * ordering column and takes the K-th smallest as the threshold; phase 2
    * pushes `col <= threshold` to S3 and runs top-K over the survivors.
    * (The table's rows are in random order, so "first S" is a uniform
    * sample — exactly the paper's argument.)
    */
  def sampling(spark: SparkSession, table: String, col: String, k: Int, sampleSize: Long,
               scale: Double): PlanResult = {
    Sim.reset()
    val client = new S3Client()

    val threshold = Sim.inPhase("sample") {
      val vals = client.select(table, s"SELECT $col FROM S3Object LIMIT $sampleSize")
        .map(_(0).toDouble)
      Sim.currentPhase.localSeconds.add(vals.length * Model.RowSortPerLog * log2(vals.length + 1))
      val sorted = vals.sorted
      sorted(math.min(k - 1, sorted.length - 1))
    }

    val df = Sim.inPhase("scan") {
      val survivors = read(spark, table, pushdown = true)
        .where(org.apache.spark.sql.functions.col(col) <= threshold)
      val d = force(survivors)
      val r = d.count()
      Sim.currentPhase.localWork(r, Model.RowHash) // returned rows feed the heap
      Sim.currentPhase.localSeconds.add(r * Model.RowSortPerLog * log2(k + 1))
      force(d.orderBy(asc(col)).limit(k))
    }
    finish(df, Seq(Seq("sample"), Seq("scan")), scale,
      Map("threshold" -> threshold.toString, "sampleSize" -> sampleSize.toString))
  }

  private def log2(x: Double): Double = math.log(x) / math.log(2)
}
