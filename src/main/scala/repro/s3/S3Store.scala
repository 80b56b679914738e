package repro.s3

import org.apache.spark.sql.types._
import scala.collection.concurrent.TrieMap

/** A stored object. Two physical formats, mirroring the paper's §IX:
  *
  *  - [[CsvObject]]: row-major text; any scan touches every byte.
  *  - [[ColumnarObject]] ("Parquet-lite"): column-major with per-column byte
  *    accounting and a Snappy-like compression factor; a scan touches only
  *    the referenced columns' (compressed) bytes. Responses are still CSV,
  *    as the real S3 Select returns CSV even for Parquet objects.
  */
sealed trait StoredObject {
  def key: String
  def schema: StructType
  def numRows: Int
  def sizeBytes: Long
  /** Row-major view for the evaluator. */
  def rows: Array[Array[String]]
  /** Bytes the storage engine reads to scan the given columns (None = all). */
  def scanBytes(columns: Option[Set[String]]): Long
}

final class CsvObject(
    val key: String,
    val schema: StructType,
    val bytes: Array[Byte],
    val rowOffsets: Array[Long],
    val rowLengths: Array[Int],
) extends StoredObject {
  lazy val rows: Array[Array[String]] = CsvCodec.decode(bytes)
  def numRows: Int = rowOffsets.length
  def sizeBytes: Long = bytes.length.toLong
  /** CSV is row-major: column pruning cannot reduce scanned bytes. */
  def scanBytes(columns: Option[Set[String]]): Long = sizeBytes
  /** Bytes scanned when the engine stops after `rowsRead` rows (LIMIT). */
  def scanBytesUpTo(rowsRead: Int): Long =
    if (rowsRead >= numRows) sizeBytes
    else if (rowsRead <= 0) 0L
    else rowOffsets(rowsRead - 1) + rowLengths(rowsRead - 1)

  def range(offset: Long, length: Int): Array[Byte] =
    java.util.Arrays.copyOfRange(bytes, offset.toInt, offset.toInt + length)
}

final class ColumnarObject(
    val key: String,
    val schema: StructType,
    columns: Array[Array[String]],       // columns(c)(r)
    val compressionFactor: Double,       // paper: Snappy Parquet = 0.7 of raw
) extends StoredObject {
  val numRows: Int = if (columns.isEmpty) 0 else columns(0).length
  /** Raw text bytes per column (what the column would occupy as CSV cells). */
  val columnRawBytes: Array[Long] = columns.map(col => col.map(c => c.length + 1L).sum)
  def sizeBytes: Long = math.round(columnRawBytes.sum * compressionFactor)
  lazy val rows: Array[Array[String]] = {
    val out = Array.ofDim[Array[String]](numRows)
    var r = 0
    while (r < numRows) {
      val row = Array.ofDim[String](columns.length)
      var c = 0
      while (c < columns.length) { row(c) = columns(c)(r); c += 1 }
      out(r) = row
      r += 1
    }
    out
  }
  def scanBytes(cols: Option[Set[String]]): Long = cols match {
    case None => sizeBytes
    case Some(names) =>
      val idx = schema.fieldNames.iterator.zipWithIndex
        .filter { case (n, _) => names.contains(n.toLowerCase) }
        .map(_._2)
      math.round(idx.map(columnRawBytes(_)).sum * compressionFactor)
  }
}

/** An in-JVM "S3": buckets of named objects. A JVM-wide singleton registry so
  * that Spark tasks in local mode and the driver see the same store — the
  * stand-in for the shared S3 service (substitution documented in DESIGN.md).
  */
final class S3Store {
  private val objects = new TrieMap[(String, String), StoredObject]

  def put(bucket: String, obj: StoredObject): Unit = objects.put((bucket, obj.key), obj)

  def get(bucket: String, key: String): StoredObject =
    objects.getOrElse((bucket, key), throw new NoSuchElementException(s"s3://$bucket/$key"))

  def list(bucket: String, prefix: String): Seq[String] =
    objects.keys.iterator
      .collect { case (b, k) if b == bucket && k.startsWith(prefix) => k }
      .toSeq.sorted

  def exists(bucket: String, key: String): Boolean = objects.contains((bucket, key))

  def drop(bucket: String, prefix: String): Unit =
    objects.keys.iterator
      .filter { case (b, k) => b == bucket && k.startsWith(prefix) }
      .foreach(objects.remove)

  def clear(): Unit = objects.clear()

  def totalBytes(bucket: String, prefix: String): Long =
    list(bucket, prefix).map(get(bucket, _).sizeBytes).sum
}

object S3Store {
  /** The shared "cloud" instance. */
  val global: S3Store = new S3Store

  /** Build and store a partitioned CSV table: rows are split round-robin-
    * by-block into `numShards` objects named `<name>/part-<i>`.
    */
  def putCsvTable(store: S3Store, bucket: String, name: String, schema: StructType,
                  rows: Array[Array[String]], numShards: Int): Seq[String] = {
    store.drop(bucket, name + "/")
    val shards = splitShards(rows, numShards)
    shards.zipWithIndex.map { case (shard, i) =>
      val enc = CsvCodec.encode(shard)
      val key = f"$name/part-$i%04d"
      store.put(bucket, new CsvObject(key, schema, enc.bytes, enc.offsets, enc.lengths))
      key
    }
  }

  /** Build and store a partitioned Parquet-lite table. */
  def putColumnarTable(store: S3Store, bucket: String, name: String, schema: StructType,
                       rows: Array[Array[String]], numShards: Int,
                       compressionFactor: Double = 0.7): Seq[String] = {
    store.drop(bucket, name + "/")
    val shards = splitShards(rows, numShards)
    shards.zipWithIndex.map { case (shard, i) =>
      val nCols = schema.size
      val cols = Array.tabulate(nCols)(c => shard.map(r => r(c)))
      val key = f"$name/part-$i%04d"
      store.put(bucket, new ColumnarObject(key, schema, cols, compressionFactor))
      key
    }
  }

  private def splitShards(rows: Array[Array[String]], numShards: Int): Seq[Array[Array[String]]] = {
    val n = rows.length
    val per = math.max(1, (n + numShards - 1) / numShards)
    (0 until numShards).map(i => rows.slice(i * per, math.min(n, (i + 1) * per)))
  }
}
