package repro.bench

import repro.baselines._
import repro.baselines.alp.ALPCodec
import repro.baselines.dac.DAC
import repro.baselines.gp._
import repro.baselines.leco.LeCo
import repro.baselines.lossy.{AdaptiveApprox, PLA}
import repro.baselines.xor._
import repro.core.neats.{NeaTS, NeaTSCompressed}
import repro.data.{Dataset, TimeSeries}

/** Shared measurement harness for the Table II / Table III reproductions.
  * All speeds are single-threaded JVM wall-clock; the paper's absolute C++
  * numbers differ by a platform factor, the comparison targets are the
  * relative positions (see EXPERIMENTS.md).
  */
object Harness {

  // ---------------------------------------------------------------- adapters

  /** NeaTSCompressed exposed through the uniform CompressedSeq interface. */
  final class NeaTSSeq(c: NeaTSCompressed) extends CompressedSeq {
    def n: Int = c.n
    def sizeInBits: Long = c.sizeInBits
    def decompressAll(): Array[Long] = c.decompressAll()
    def get(i: Int): Long = c(i)
    def range(from: Int, len: Int): Array[Long] = c.range(from, len)
  }

  /** One lossless competitor: how to build its compressed form from a dataset.
    * `family` is "gp" (general-purpose) or "sp" (special-purpose), matching
    * the two families of Table III.
    */
  final case class Adapter(name: String, family: String, build: Dataset => CompressedSeq)

  /** The 13 lossless compressors of Table III, in the paper's column order.
    * Double-native codecs (XOR family, ALP) get the raw double bits; the
    * rest get the 64-bit integer view — exactly the paper's §IV-A1 protocol.
    * Original size is 64 bits/value either way.
    */
  val losslessAdapters: Seq[Adapter] = Seq(
    Adapter("Xz", "gp", ds => new BlockStore(XzCodec, ds.longs)),
    Adapter("Brotli*", "gp", ds => new BlockStore(BrotliLikeCodec, ds.longs)),
    Adapter("Zstd", "gp", ds => new BlockStore(ZstdCodec, ds.longs)),
    Adapter("Lz4", "gp", ds => new BlockStore(Lz4Codec, ds.longs)),
    Adapter("Snappy", "gp", ds => new BlockStore(SnappyCodec, ds.longs)),
    Adapter("Gorilla", "sp", ds => new BlockStore(GorillaCodec, Codec.doublesToBits(ds.values))),
    Adapter("Chimp", "sp", ds => new BlockStore(ChimpCodec, Codec.doublesToBits(ds.values))),
    Adapter("Chimp128", "sp", ds => new BlockStore(Chimp128Codec, Codec.doublesToBits(ds.values))),
    Adapter("TSXor", "sp", ds => new BlockStore(TSXorCodec, Codec.doublesToBits(ds.values))),
    Adapter("DAC", "sp", ds => DAC.compress(ds.longs)),
    Adapter("LeCo", "sp", ds => LeCo.compress(ds.longs)),
    Adapter("ALP", "sp", ds => new BlockStore(ALPCodec, Codec.doublesToBits(ds.values))),
    Adapter("NeaTS", "sp", ds => new NeaTSSeq(NeaTS.compress(ds.longs))),
  )

  /** Compression-speed variants of NeaTS (Figure 2 discussion, §IV-C1). */
  val neatsVariants: Seq[Adapter] = Seq(
    Adapter("LeaTS", "sp", ds => new NeaTSSeq(NeaTS.compressLinearOnly(ds.longs))),
    Adapter("SNeaTS", "sp", ds => new NeaTSSeq(NeaTS.compressSelected(ds.longs))),
  )

  // ------------------------------------------------------------ measurements

  final case class LosslessRow(codec: String, family: String, dataset: String, n: Int,
                               ratioPct: Double, compressMBs: Double,
                               decompressMBs: Double, randomAccessMBs: Double)

  private def timeNs[A](body: => A): (A, Long) = {
    val t0 = System.nanoTime()
    val a = body
    (a, System.nanoTime() - t0)
  }

  /** Best-of-k wall clock in nanoseconds. */
  private def bestOf[A](k: Int)(body: => A): (A, Long) = {
    var best = Long.MaxValue
    var last: A = null.asInstanceOf[A]
    (0 until k).foreach { _ =>
      val (a, t) = timeNs(body)
      last = a
      if (t < best) best = t
    }
    (last, best)
  }

  def measureLossless(adapter: Adapter, ds: Dataset, raQueries: Int = 20000): LosslessRow = {
    val bytes = ds.n.toDouble * 8
    val (compressed, cNs) = timeNs(adapter.build(ds))
    val (decoded, dNs) = bestOf(3)(compressed.decompressAll())
    require(decoded.length == ds.n, s"${adapter.name} decoded wrong length on ${ds.name}")
    val rng = new java.util.Random(97)
    val queries = Array.fill(raQueries)(rng.nextInt(ds.n))
    var sink = 0L
    val (_, raNs) = timeNs {
      var i = 0
      while (i < queries.length) { sink ^= compressed.get(queries(i)); i += 1 }
    }
    if (sink == 42L) println("") // keep the sink live
    LosslessRow(
      adapter.name, adapter.family, ds.name, ds.n,
      ratioPct = compressed.sizeInBits * 100.0 / (ds.n.toLong * 64),
      compressMBs = bytes / 1e6 / (cNs / 1e9),
      decompressMBs = bytes / 1e6 / (dNs / 1e9),
      randomAccessMBs = raQueries * 8.0 / 1e6 / (raNs / 1e9),
    )
  }

  /** Sanity: the decompressed payloads must equal the input payloads. */
  def verifyLossless(adapter: Adapter, ds: Dataset): Boolean = {
    val expected =
      if (Set("Gorilla", "Chimp", "Chimp128", "TSXor", "ALP").contains(adapter.name))
        Codec.doublesToBits(ds.values)
      else ds.longs
    adapter.build(ds).decompressAll().sameElements(expected)
  }

  // -------------------------------------------------------------- Table II

  final case class LossyRow(dataset: String, eps: Long, epsPct: Double,
                            aaPct: Double, plaPct: Double, neatsPct: Double,
                            aaMape: Double, plaMape: Double, neatsMape: Double,
                            aaCompressMBs: Double, plaCompressMBs: Double,
                            neatsCompressMBs: Double)

  /** The paper's Table II eps selection: "the smallest eps such that NeaTS-L
    * achieves better compression than our lossless compressor NeaTS"
    * (§IV-B), searched over the power-of-two grid. Our analogues have a
    * different noise-to-range profile than the originals, so re-running the
    * paper's procedure (rather than copying its eps%) keeps the experiment
    * meaningful on our data.
    */
  def epsFor(ds: Dataset): Long = {
    val losslessBits = NeaTS.compress(ds.longs).sizeInBits
    val grid = NeaTS.epsGrid(ds.longs).filter(_ > 0)
    grid.find { eps =>
      val pieces = NeaTS.lossyPieces(ds.longs, eps)
      pieces.map(p => 64L * p.kind.nParams + 32L).sum < losslessBits
    }.getOrElse(grid.last)
  }

  def measureLossy(ds: Dataset): LossyRow = {
    val eps = epsFor(ds)
    val origBits = ds.n.toLong * 64
    val shift = NeaTS.shiftFor(ds.longs, eps)

    val (plaFits, plaNs) = timeNs(PLA.partition(ds.longs, eps))
    val (aaFrags, aaNs) = timeNs(AdaptiveApprox.partition(ds.longs, shift, eps))
    val (neatsPieces, neatsNs) = timeNs(NeaTS.lossyPieces(ds.longs, eps))

    val plaBits = PLA.sizeBits(plaFits)
    val aaBits = AdaptiveApprox.sizeBits(aaFrags)
    val neatsBits = neatsPieces.map(p => 64L * p.kind.nParams + 32L).sum

    def mape(approx: Int => Double): Double = {
      var acc = 0.0
      var cnt = 0
      var i = 0
      while (i < ds.n) {
        val actual = ds.longs(i).toDouble
        if (actual != 0.0) { acc += math.abs((approx(i) - actual) / actual); cnt += 1 }
        i += 1
      }
      100.0 * acc / math.max(1, cnt)
    }
    val plaStarts = plaFits.map(_.start)
    val aaStarts = aaFrags.map(_.start)
    val neatsStarts = neatsPieces.map(_.start)
    val plaEval = (i: Int) => plaFits(idxOf(plaStarts, i)).eval(i)
    val aaEval = (i: Int) => aaFrags(idxOf(aaStarts, i)).eval(i) - shift
    val neatsEval = (i: Int) => neatsPieces(idxOf(neatsStarts, i)).eval(i) - shift
    val bytes = ds.n.toDouble * 8
    LossyRow(
      ds.name, eps, 100.0 * eps / math.max(1L, ds.valueRange),
      aaPct = aaBits * 100.0 / origBits,
      plaPct = plaBits * 100.0 / origBits,
      neatsPct = neatsBits * 100.0 / origBits,
      aaMape = mape(aaEval), plaMape = mape(plaEval), neatsMape = mape(neatsEval),
      aaCompressMBs = bytes / 1e6 / (aaNs / 1e9),
      plaCompressMBs = bytes / 1e6 / (plaNs / 1e9),
      neatsCompressMBs = bytes / 1e6 / (neatsNs / 1e9),
    )
  }

  private def idxOf(starts: Seq[Int], i: Int): Int = {
    var lo = 0
    var hi = starts.length - 1
    while (lo < hi) {
      val mid = (lo + hi + 1) >>> 1
      if (starts(mid) <= i) lo = mid else hi = mid - 1
    }
    lo
  }

  // ---------------------------------------------------------- range queries

  final case class RangeRow(codec: String, rangeSize: Int, queriesPerSec: Double)

  /** Figure-4-style range throughput for the random-access leaders. */
  def measureRange(ds: Dataset, rangeSizes: Seq[Int], queries: Int = 500): Seq[RangeRow] = {
    val contenders: Seq[(String, CompressedSeq)] = Seq(
      "NeaTS" -> new NeaTSSeq(NeaTS.compress(ds.longs)),
      "DAC" -> DAC.compress(ds.longs),
      "ALP" -> new BlockStore(ALPCodec, Codec.doublesToBits(ds.values)),
      "Lz4" -> new BlockStore(Lz4Codec, ds.longs),
    )
    val rng = new java.util.Random(31)
    // Warm every contender's decode path before the first measurement (the
    // smallest range size is measured first and would otherwise pay JIT).
    contenders.foreach { case (_, c) =>
      var w = 0
      while (w < 300) {
        val s = rng.nextInt(math.max(1, ds.n - 64))
        c match {
          case ns2: NeaTSSeq => ns2.range(s, 64)
          case bs: BlockStore => bs.range(s, 64)
          case other => var j = 0; while (j < 64) { other.get(s + j); j += 1 }
        }
        w += 1
      }
    }
    for {
      size <- rangeSizes
      (name, c) <- contenders
    } yield {
      val starts = Array.fill(queries)(rng.nextInt(math.max(1, ds.n - size)))
      var sink = 0L
      val (_, ns) = timeNs {
        starts.foreach { s =>
          val got = c match {
            case ns2: NeaTSSeq => ns2.range(s, size)
            case bs: BlockStore => bs.range(s, size)
            case other => Array.tabulate(size)(j => other.get(s + j))
          }
          sink ^= got(size - 1)
        }
      }
      if (sink == 42L) println("")
      RangeRow(name, size, queries.toDouble / (ns / 1e9))
    }
  }
}
