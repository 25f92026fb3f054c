package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.data.TimeSeries

/** Figure-4-style range query throughput (bonus beyond the tables): the
  * random-access/decompression leaders (ALP, DAC, Lz4, NeaTS) across range
  * sizes 10 * 2^k. The paper's finding: DAC wins below ~40 points, NeaTS
  * wins above, both orders of magnitude ahead of block-wise codecs at small
  * ranges.
  */
class RangeQueryBench extends AnyFunSuite {

  private val scale = sys.env.getOrElse("BENCH_SCALE", "1.0").toDouble

  test("range query throughput across range sizes") {
    val ds = TimeSeries.dataset("US", math.max(4096, (100000 * scale).toInt))
    val sizes = (0 to 10).map(k => 10 * (1 << k)).filter(_ < ds.n / 2)
    val rows = Harness.measureRange(ds, sizes)
    sizes.foreach { s =>
      val at = rows.filter(_.rangeSize == s)
      val str = at.map(r => f"${r.codec}=${r.queriesPerSec}%,.0f q/s").mkString("  ")
      println(s"RANGE size=$s  $str")
    }
    // Large ranges: NeaTS must beat the block-wise codecs (ALP, Lz4).
    val big = rows.filter(_.rangeSize == sizes.max)
    val neats = big.find(_.codec == "NeaTS").get.queriesPerSec
    assert(neats > big.find(_.codec == "Lz4").get.queriesPerSec * 0.8,
      "NeaTS should be at least competitive with Lz4 on large ranges")
    // Small ranges: NeaTS and DAC must dwarf the block-wise codecs.
    val small = rows.filter(_.rangeSize == sizes.min)
    val neatsSmall = small.find(_.codec == "NeaTS").get.queriesPerSec
    val lz4Small = small.find(_.codec == "Lz4").get.queriesPerSec
    assert(neatsSmall > 2 * lz4Small, "NeaTS should dominate block-wise codecs on small ranges")
  }
}
