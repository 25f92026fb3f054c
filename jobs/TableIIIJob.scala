package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.Harness
import repro.data.TimeSeries

/** spark-submit entrypoint reproducing Table III (lossless compression ratio,
  * decompression speed, random access speed of 13 compressors x 16 datasets).
  * Each (dataset, codec) cell is an independent task.
  *
  *   spark-submit --class repro.jobs.TableIIIJob repro.jar [scale]
  */
object TableIIIJob {
  def main(args: Array[String]): Unit = {
    val scale = args.headOption.map(_.toDouble).getOrElse(1.0)
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("neats-table3")
      .getOrCreate()
    try {
      val cells = for {
        (name, n) <- TimeSeries.benchSizes
        adapter <- Harness.losslessAdapters.map(_.name)
      } yield (name, math.max(64, (n * scale).toInt), adapter)
      val rows = spark.sparkContext
        .parallelize(cells, cells.size)
        .map { case (name, n, codecName) =>
          val adapter = Harness.losslessAdapters.find(_.name == codecName).get
          Harness.measureLossless(adapter, TimeSeries.dataset(name, n))
        }
        .collect()
      val names = Harness.losslessAdapters.map(_.name)
      def section(title: String, value: Harness.LosslessRow => Double, fmt: String): Unit = {
        println(s"=== $title ===")
        println("ds".padTo(5, ' ') + names.map(_.padTo(9, ' ')).mkString)
        TimeSeries.names.foreach { ds =>
          val cols = names.map { n =>
            fmt.format(value(rows.find(r => r.codec == n && r.dataset == ds).get)).padTo(9, ' ')
          }
          println(ds.padTo(5, ' ') + cols.mkString)
        }
      }
      section("compression ratio (%)", _.ratioPct, "%.2f")
      section("decompression speed (MB/s)", _.decompressMBs, "%.1f")
      section("random access speed (MB/s)", _.randomAccessMBs, "%.3f")
    } finally spark.stop()
  }
}
