package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.data.TimeSeries

/** Table II reproduction: compression ratios of the lossy approaches
  * (AA, PLA, NeaTS-L) on the 16 dataset analogues, plus the MAPE and
  * compression-speed side results of §IV-B. Prints the table; paper values
  * are recorded side-by-side in EXPERIMENTS.md.
  */
class TableIIBench extends AnyFunSuite {

  private val scale = sys.env.getOrElse("BENCH_SCALE", "1.0").toDouble

  test("Table II: lossy compression ratios (AA vs PLA vs NeaTS-L)") {
    val rows = TimeSeries.benchmarks(scale).map { ds =>
      val row = Harness.measureLossy(ds)
      printf("TABLE2 %-4s eps=%-10d (%8.2e%% of range) AA=%6.2f%% PLA=%6.2f%% NeaTS-L=%6.2f%% improvAA=%6.2f%% improvPLA=%6.2f%%%n",
        row.dataset, row.eps, row.epsPct, row.aaPct, row.plaPct, row.neatsPct,
        100 * (1 - row.neatsPct / row.aaPct), 100 * (1 - row.neatsPct / row.plaPct))
      row
    }

    val avgMapeAA = rows.map(_.aaMape).sum / rows.size
    val avgMapePLA = rows.map(_.plaMape).sum / rows.size
    val avgMapeNeaTS = rows.map(_.neatsMape).sum / rows.size
    printf("TABLE2 MAPE%%: AA=%.2f NeaTS-L=%.2f PLA=%.2f (paper: 2.47 / 2.85 / 4.37)%n",
      avgMapeAA, avgMapeNeaTS, avgMapePLA)
    printf("TABLE2 compression MB/s: PLA=%.2f AA=%.2f NeaTS-L=%.2f (paper: 123.36 / 63.11 / 18.23)%n",
      rows.map(_.plaCompressMBs).sum / rows.size,
      rows.map(_.aaCompressMBs).sum / rows.size,
      rows.map(_.neatsCompressMBs).sum / rows.size)

    // Headline claims of §IV-B: NeaTS-L beats both baselines on (essentially)
    // every dataset; we require it on >= 14/16 and strictly on average.
    val beatsAA = rows.count(r => r.neatsPct <= r.aaPct)
    val beatsPLA = rows.count(r => r.neatsPct <= r.plaPct)
    assert(beatsAA >= 14, s"NeaTS-L beats AA only on $beatsAA/16 datasets")
    assert(beatsPLA >= 14, s"NeaTS-L beats PLA only on $beatsPLA/16 datasets")
    assert(rows.map(_.neatsPct).sum < rows.map(_.plaPct).sum)
    assert(rows.map(_.neatsPct).sum < rows.map(_.aaPct).sum)
    // PLA is the fastest lossy compressor, as in the paper.
    assert(rows.map(_.plaCompressMBs).sum > rows.map(_.neatsCompressMBs).sum)
  }
}
