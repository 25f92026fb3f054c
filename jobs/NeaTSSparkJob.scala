package repro.jobs

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions._
import repro.data.TimeSeries
import repro.sparkts.{NeaTSCodec, NeaTSDataSource, NeaTSFiles}

/** spark-submit entrypoint demonstrating the Spark integration: compress a
  * time series into NeaTS row groups (per-partition encoder), persist it as a
  * NeaTS table, and run a pushed-down range aggregate over it.
  *
  *   spark-submit --class repro.jobs.NeaTSSparkJob repro.jar [n] [outDir]
  */
object NeaTSSparkJob {
  def main(args: Array[String]): Unit = {
    val n = args.headOption.map(_.toInt).getOrElse(100000)
    val out = args.lift(1).getOrElse(
      java.nio.file.Files.createTempDirectory("neats-table").toString)
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("neats-spark")
      .getOrCreate()
    import spark.implicits._
    try {
      val ds = TimeSeries.dataset("US", n)
      val df = ds.longs.zipWithIndex.map { case (v, i) => (i.toLong, v) }.toSeq.toDF("idx", "value")

      // 1) in-flight row-group compression via the per-partition codec
      val enc = NeaTSCodec.encode(df, groupSize = 8192).cache()
      val compressedBytes = enc.select(sum(length($"blob"))).as[Long].head()
      println(f"row groups: ${enc.count()}; compressed ${compressedBytes * 100.0 / (n * 8L)}%.2f%% of raw")

      // 2) persisted NeaTS table + pushed-down range query
      NeaTSFiles.write(out, ds.longs, groupSize = 8192)
      val table = spark.read.format(NeaTSDataSource.format).option("path", out).load()
      val agg = table
        .where($"idx" >= n / 4 && $"idx" < n / 2)
        .agg(avg($"value").as("mean"), count(lit(1)).as("cnt"))
        .collect()(0)
      println(s"range aggregate over [${n / 4}, ${n / 2}): mean=${agg.get(0)} cnt=${agg.get(1)}")
      println(s"table stored at $out")
    } finally spark.stop()
  }
}
