package repro.s3

import org.apache.spark.sql.types.StructType
import SelectAst.SelectQuery

/** Client-side API to the simulated S3: S3 Select queries, whole-object GETs
  * and byte-range GETs. Every call attributes its traffic to the current
  * [[Sim]] phase. Queries are submitted as SQL *strings* — parsed here with
  * the 256 KB limit enforced, exactly like the real service.
  */
final class S3Client(store: S3Store = S3Store.global, bucket: String = S3Client.DefaultBucket) {

  /** Run one S3 Select query against every object with the given prefix
    * (one request per object, as PushdownDB issues them in parallel) and
    * concatenate the results.
    */
  def select(tableName: String, sql: String): Vector[Array[String]] = {
    val q = SelectParser.parse(sql)
    selectParsed(tableName, q)
  }

  /** Like [[select]] but stops issuing per-object requests once `limit`
    * rows have been produced (used by sampling algorithms: "read the first
    * S records", §VII-A).
    */
  def selectParsed(tableName: String, q: SelectQuery): Vector[Array[String]] = {
    val keys = objectKeys(tableName)
    val out  = Vector.newBuilder[Array[String]]
    var produced = 0L
    val limit = q.limit.getOrElse(Long.MaxValue)
    val it = keys.iterator
    while (it.hasNext && produced < limit) {
      val remaining = limit - produced
      val perObj =
        if (q.limit.isDefined) q.copy(limit = Some(remaining))
        else q
      val res = SelectEngine.run(store.get(bucket, it.next()), perObj)
      Sim.currentPhase.recordSelect(res.scannedBytes, res.returnedBytes, res.exprFactor)
      Sim.currentPhase.localParse(res.returnedBytes) // server parses the CSV response
      out ++= res.rows
      produced += res.rows.size
    }
    out.result()
  }

  /** Load a whole table (all shard objects) with plain GETs — the baseline
    * path that does not use S3 Select (no scan charge, full transfer).
    */
  def getTable(tableName: String): Vector[Array[String]] = {
    val out = Vector.newBuilder[Array[String]]
    objectKeys(tableName).foreach { k =>
      val obj = store.get(bucket, k)
      Sim.currentPhase.recordGet(obj.sizeBytes)
      Sim.currentPhase.localParse(obj.sizeBytes)
      out ++= obj.rows
    }
    out.result()
  }

  /** HTTP byte-range GET of one record (§IV-A phase 2). */
  def getRange(key: String, offset: Long, length: Int): Array[String] = {
    store.get(bucket, key) match {
      case c: CsvObject =>
        val bytes = c.range(offset, length)
        Sim.currentPhase.recordGet(length.toLong)
        CsvCodec.decodeLine(new String(bytes, java.nio.charset.StandardCharsets.UTF_8).stripLineEnd)
      case _ => throw new EvalException(s"range GET only supported on CSV objects: $key")
    }
  }

  def schemaOf(tableName: String): StructType = {
    val keys = objectKeys(tableName)
    store.get(bucket, keys.head).schema
  }

  def objectKeys(tableName: String): Seq[String] = {
    val keys = store.list(bucket, tableName + "/")
    if (keys.nonEmpty) keys
    else if (store.exists(bucket, tableName)) Seq(tableName)
    else throw new NoSuchElementException(s"no objects for table s3://$bucket/$tableName")
  }

  def tableBytes(tableName: String): Long =
    objectKeys(tableName).map(store.get(bucket, _).sizeBytes).sum

  def tableRows(tableName: String): Long =
    objectKeys(tableName).map(store.get(bucket, _).numRows.toLong).sum
}

object S3Client {
  val DefaultBucket = "tpch"
}
