package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.Harness
import repro.data.TimeSeries

/** spark-submit entrypoint reproducing Table II (lossy compression ratios of
  * AA vs PLA vs NeaTS-L). The per-dataset measurements are independent, so
  * they are distributed over the cluster as one task per dataset.
  *
  *   spark-submit --class repro.jobs.TableIIJob repro.jar [scale]
  */
object TableIIJob {
  def main(args: Array[String]): Unit = {
    val scale = args.headOption.map(_.toDouble).getOrElse(1.0)
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("neats-table2")
      .getOrCreate()
    try {
      val names = TimeSeries.benchSizes
      val rows = spark.sparkContext
        .parallelize(names, names.size)
        .map { case (name, n) =>
          Harness.measureLossy(TimeSeries.dataset(name, math.max(64, (n * scale).toInt)))
        }
        .collect()
        .sortBy(r => names.indexWhere(_._1 == r.dataset))
      println(f"${"ds"}%-5s ${"eps"}%-12s ${"AA%"}%-8s ${"PLA%"}%-8s ${"NeaTS-L%"}%-9s improvAA improvPLA")
      rows.foreach { r =>
        println(f"${r.dataset}%-5s ${r.eps}%-12d ${r.aaPct}%-8.2f ${r.plaPct}%-8.2f ${r.neatsPct}%-9.2f " +
          f"${100 * (1 - r.neatsPct / r.aaPct)}%7.2f%% ${100 * (1 - r.neatsPct / r.plaPct)}%7.2f%%")
      }
      println(f"avg MAPE%%: AA=${rows.map(_.aaMape).sum / rows.size}%.2f " +
        f"NeaTS-L=${rows.map(_.neatsMape).sum / rows.size}%.2f " +
        f"PLA=${rows.map(_.plaMape).sum / rows.size}%.2f")
    } finally spark.stop()
  }
}
