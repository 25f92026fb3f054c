package repro.sparkts

import java.util
import org.apache.spark.sql.connector.catalog.{SupportsRead, Table, TableCapability, TableProvider}
import org.apache.spark.sql.connector.expressions.Transform
import org.apache.spark.sql.connector.read._
import org.apache.spark.sql.catalyst.InternalRow
import org.apache.spark.sql.sources
import org.apache.spark.sql.types._
import org.apache.spark.sql.util.CaseInsensitiveStringMap
import repro.core.neats.{NeaTS, NeaTSCompressed}

/** File layout of a NeaTS-compressed table: a directory with one blob file
  * per row group plus a `meta` index (group start, count, file name) — the
  * moral equivalent of Parquet row groups with a footer.
  */
object NeaTSFiles {
  final case class Group(start: Long, count: Int, file: String)

  def write(path: String, values: Array[Long], groupSize: Int = 8192): Unit = {
    val dir = new java.io.File(path)
    dir.mkdirs()
    val meta = new StringBuilder
    meta.append(s"${values.length} $groupSize\n")
    var g = 0
    var start = 0
    while (start < values.length) {
      val count = math.min(groupSize, values.length - start)
      val blob = NeaTS.compress(java.util.Arrays.copyOfRange(values, start, start + count)).toBytes
      val name = f"group-$g%05d.neats"
      java.nio.file.Files.write(new java.io.File(dir, name).toPath, blob)
      meta.append(s"$start $count $name\n")
      start += count
      g += 1
    }
    java.nio.file.Files.write(new java.io.File(dir, "meta").toPath,
      meta.toString.getBytes("UTF-8"))
  }

  def readMeta(path: String): (Long, Seq[Group]) = {
    val lines = new String(java.nio.file.Files.readAllBytes(
      new java.io.File(path, "meta").toPath), "UTF-8").linesIterator.toSeq
    val n = lines.head.split(" ")(0).toLong
    val groups = lines.tail.filter(_.nonEmpty).map { l =>
      val parts = l.split(" ")
      Group(parts(0).toLong, parts(1).toInt, parts(2))
    }
    (n, groups)
  }

  def readGroup(path: String, g: Group): NeaTSCompressed =
    NeaTSCompressed.fromBytes(java.nio.file.Files.readAllBytes(
      new java.io.File(path, g.file).toPath))
}

/** DataSourceV2 provider: `spark.read.format("repro.sparkts.NeaTSDataSource")
  * .option("path", dir).load()` exposes (idx: Long, value: Long) with `idx`
  * range filters pushed down to row-group pruning + in-group random access.
  */
class NeaTSDataSource extends TableProvider {
  override def inferSchema(options: CaseInsensitiveStringMap): StructType = NeaTSDataSource.schema

  override def getTable(schema: StructType, partitioning: Array[Transform],
                        properties: util.Map[String, String]): Table = {
    val path = properties.get("path")
    require(path != null, "option 'path' is required for the neats data source")
    new NeaTSTable(path)
  }
}

object NeaTSDataSource {
  val schema: StructType = StructType(Seq(
    StructField("idx", LongType, nullable = false),
    StructField("value", LongType, nullable = false),
  ))
  val format: String = classOf[NeaTSDataSource].getName
}

class NeaTSTable(path: String) extends Table with SupportsRead {
  override def name(): String = s"neats:$path"
  override def schema(): StructType = NeaTSDataSource.schema
  override def capabilities(): util.Set[TableCapability] =
    util.EnumSet.of(TableCapability.BATCH_READ)
  override def newScanBuilder(options: CaseInsensitiveStringMap): ScanBuilder =
    new NeaTSScanBuilder(path)
}

/** Pushes idx range predicates (>=, >, <=, <, =) down to row-group pruning. */
class NeaTSScanBuilder(path: String) extends ScanBuilder with SupportsPushDownFilters {
  private var lo: Long = Long.MinValue
  private var hi: Long = Long.MaxValue // inclusive
  private var pushed: Array[sources.Filter] = Array.empty

  override def pushFilters(filters: Array[sources.Filter]): Array[sources.Filter] = {
    val (accepted, rejected) = filters.partition {
      case sources.GreaterThan("idx", _: Long) => true
      case sources.GreaterThanOrEqual("idx", _: Long) => true
      case sources.LessThan("idx", _: Long) => true
      case sources.LessThanOrEqual("idx", _: Long) => true
      case sources.EqualTo("idx", _: Long) => true
      case _ => false
    }
    accepted.foreach {
      case sources.GreaterThan("idx", v: Long) => lo = math.max(lo, v + 1)
      case sources.GreaterThanOrEqual("idx", v: Long) => lo = math.max(lo, v)
      case sources.LessThan("idx", v: Long) => hi = math.min(hi, v - 1)
      case sources.LessThanOrEqual("idx", v: Long) => hi = math.min(hi, v)
      case sources.EqualTo("idx", v: Long) => lo = math.max(lo, v); hi = math.min(hi, v)
      case _ =>
    }
    pushed = accepted
    rejected // Spark re-evaluates nothing for accepted ones; rejected stay post-scan
  }

  override def pushedFilters(): Array[sources.Filter] = pushed

  override def build(): Scan = new NeaTSScan(path, lo, hi)
}

class NeaTSScan(path: String, lo: Long, hi: Long) extends Scan with Batch {
  override def readSchema(): StructType = NeaTSDataSource.schema
  override def toBatch: Batch = this

  override def planInputPartitions(): Array[InputPartition] = {
    val (_, groups) = NeaTSFiles.readMeta(path)
    groups
      .filter(g => g.start <= hi && g.start + g.count - 1 >= lo)
      .map(g => NeaTSInputPartition(path, g.start, g.count, g.file, lo, hi): InputPartition)
      .toArray
  }

  override def createReaderFactory(): PartitionReaderFactory = new NeaTSReaderFactory
}

final case class NeaTSInputPartition(path: String, start: Long, count: Int,
                                     file: String, lo: Long, hi: Long) extends InputPartition

class NeaTSReaderFactory extends PartitionReaderFactory {
  override def createReader(partition: InputPartition): PartitionReader[InternalRow] = {
    val p = partition.asInstanceOf[NeaTSInputPartition]
    new NeaTSPartitionReader(p)
  }
}

/** Decodes one row group, restricted to the pushed [lo, hi] index range:
  * one NeaTS random access for the first point, then a sequential scan.
  */
class NeaTSPartitionReader(p: NeaTSInputPartition) extends PartitionReader[InternalRow] {
  private val from = math.max(p.lo, p.start)
  private val until = math.min(p.hi, p.start + p.count - 1) + 1
  private val values: Array[Long] =
    if (until <= from) Array.empty
    else {
      val c = NeaTSFiles.readGroup(p.path, NeaTSFiles.Group(p.start, p.count, p.file))
      c.range((from - p.start).toInt, (until - from).toInt)
    }
  private var i = -1

  override def next(): Boolean = { i += 1; i < values.length }
  override def get(): InternalRow = InternalRow(from + i, values(i))
  override def close(): Unit = ()
}
