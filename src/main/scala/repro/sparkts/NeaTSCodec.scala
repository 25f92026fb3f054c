package repro.sparkts

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import repro.core.neats.{NeaTS, NeaTSCompressed}

/** NeaTS as a per-partition (row-group) columnar encoder on Spark, analogous
  * to a Parquet page encoding: rows (idx, value) are grouped into fixed-size
  * row groups, each compressed into one NeaTS blob; decoding and range
  * queries touch only the groups that overlap the requested index range and
  * use NeaTS random access (Algorithm 3) inside each group.
  *
  * Indexes must be dense (0..n-1) — the paper's setting where timestamps are
  * mapped to consecutive integers (§III-C, footnote 5).
  */
object NeaTSCodec {

  /** Compress a (idx: Long, value: Long) DataFrame into row groups.
    * Output schema: (group_start: Long, count: Int, blob: Binary).
    */
  def encode(df: DataFrame, groupSize: Int = 8192): DataFrame = {
    val spark = df.sparkSession
    import spark.implicits._
    df.selectExpr("CAST(idx AS LONG) AS idx", "CAST(value AS LONG) AS value")
      .as[(Long, Long)]
      .groupByKey(_._1 / groupSize)
      .mapGroups { (g, it) =>
        val arr = it.toArray.sortBy(_._1)
        val start = g * groupSize
        require(arr.head._1 == start && arr.last._1 == start + arr.length - 1,
          s"row group $g is not dense: [${arr.head._1}, ${arr.last._1}] with ${arr.length} rows")
        val blob = NeaTS.compress(arr.map(_._2)).toBytes
        (start, arr.length, blob)
      }
      .toDF("group_start", "count", "blob")
  }

  /** Full decode back to (idx, value). */
  def decode(encoded: DataFrame): DataFrame = {
    val spark = encoded.sparkSession
    import spark.implicits._
    encoded.select($"group_start".as[Long], $"count".as[Int], $"blob".as[Array[Byte]])
      .flatMap { case (start, count, blob) =>
        val values = NeaTSCompressed.fromBytes(blob).decompressAll()
        Iterator.tabulate(count)(i => (start + i, values(i)))
      }
      .toDF("idx", "value")
  }

  /** Range query [from, until): decodes only overlapping groups, and within
    * each group only the overlapping slice (one rank + sequential scan).
    */
  def rangeQuery(encoded: DataFrame, from: Long, until: Long): DataFrame = {
    val spark = encoded.sparkSession
    import spark.implicits._
    encoded
      .where($"group_start" + $"count" > from && $"group_start" < until)
      .select($"group_start".as[Long], $"count".as[Int], $"blob".as[Array[Byte]])
      .flatMap { case (start, count, blob) =>
        val lo = math.max(from, start)
        val hi = math.min(until, start + count)
        val c = NeaTSCompressed.fromBytes(blob)
        val slice = c.range((lo - start).toInt, (hi - lo).toInt)
        Iterator.tabulate(slice.length)(i => (lo + i, slice(i)))
      }
      .toDF("idx", "value")
  }

  /** Point lookup via Algorithm 3 inside the single covering group. */
  def pointQuery(encoded: DataFrame, idx: Long, groupSize: Int): Option[Long] = {
    val spark = encoded.sparkSession
    import spark.implicits._
    val g = idx / groupSize * groupSize
    encoded.where($"group_start" === g)
      .select($"group_start".as[Long], $"blob".as[Array[Byte]])
      .collect()
      .headOption
      .map { case (start, blob) => NeaTSCompressed.fromBytes(blob)((idx - start).toInt) }
  }
}
