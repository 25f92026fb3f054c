package repro.core.neats

import repro.core.approx.{ExponentialKind, FunctionKind, LinearKind, QuadraticKind, RadicalKind}
import repro.core.bits._

/** The NeaTS compressed representation <S, B, O, C, K, P> of a time series
  * (§III-C of the paper) plus the global value shift:
  *
  *  - S: Elias-Fano over fragment start positions (0-based), with rank;
  *  - B: fixed-width array of per-fragment correction bit widths;
  *  - O: Elias-Fano over cumulative correction bit offsets (m+1 entries);
  *  - C: packed correction bits (signed two's complement per value);
  *  - K: wavelet tree over the function-kind string, with rank_f;
  *  - P: per-kind concatenated parameter arrays (64-bit doubles).
  *
  * Supports full decompression (Algorithm 2), O(log m) random access
  * (Algorithm 3; the rank is the only non-constant step) and range scans.
  */
final class NeaTSCompressed(
    val n: Int,
    val shift: Long,
    val s: EliasFano,          // fragment starts, length m
    val b: FixedWidthArray,    // correction widths, length m
    val o: EliasFano,          // cumulative correction offsets, length m+1
    val c: BitReader,          // packed corrections
    val k: WaveletTree,        // kinds, length m
    val p: Array[Array[Double]], // per-kind-id parameter arrays
) {
  def numFragments: Int = s.length

  /** Algorithm 3: value at 0-based index idx. */
  def apply(idx: Int): Long = {
    require(idx >= 0 && idx < n, s"index $idx out of [0, $n)")
    val frag = s.rank(idx) - 1
    decodeAt(idx, frag)
  }

  private def kindParamsOf(frag: Int): (FunctionKind, Double, Double, Double) = {
    val kindId = k(frag)
    val kind = FunctionKind.byId(kindId)
    val base = k.rank(kindId, frag) * kind.nParams
    val pf = p(kindId)
    val p3 = if (kind.nParams == 3) pf(base + 2) else 0.0
    (kind, pf(base), pf(base + 1), p3)
  }

  private def decodeAt(idx: Int, frag: Int): Long = {
    val start = s(frag)
    val (kind, m, b0, p3) = kindParamsOf(frag)
    val width = b(frag).toInt
    val approx = math.floor(kind.eval((idx + 1).toDouble, m, b0, p3) + 1e-9).toLong
    val corr =
      if (width == 0) 0L
      else c.getSigned(o(frag) + (idx - start) * width.toLong, width)
    approx + corr - shift
  }

  /** Decode points [from, until) of one fragment into out(outPos...). The
    * per-kind loops keep the function evaluation monomorphic — the paper's
    * decompression is SIMD-vectorised, and a megamorphic virtual call per
    * point is the JVM equivalent of leaving that factor on the table.
    */
  private def decodeRun(kind: FunctionKind, m0: Double, b0: Double, p3: Double,
                        from: Int, until: Int, width: Int, off0: Long,
                        out: Array[Long], outPos0: Int): Unit = {
    var off = off0
    var i = from
    var pos = outPos0
    val sh = shift
    val words = c
    kind match {
      case LinearKind =>
        while (i < until) {
          val approx = math.floor(m0 * (i + 1) + b0 + 1e-9).toLong
          val corr = if (width == 0) 0L else words.getSigned(off, width)
          out(pos) = approx + corr - sh
          off += width; i += 1; pos += 1
        }
      case RadicalKind =>
        while (i < until) {
          val approx = math.floor(m0 * math.sqrt((i + 1).toDouble) + b0 + 1e-9).toLong
          val corr = if (width == 0) 0L else words.getSigned(off, width)
          out(pos) = approx + corr - sh
          off += width; i += 1; pos += 1
        }
      case ExponentialKind =>
        while (i < until) {
          val approx = math.floor(math.exp(m0 * (i + 1) + b0) + 1e-9).toLong
          val corr = if (width == 0) 0L else words.getSigned(off, width)
          out(pos) = approx + corr - sh
          off += width; i += 1; pos += 1
        }
      case QuadraticKind =>
        while (i < until) {
          val x = (i + 1).toDouble
          val approx = math.floor(m0 * x * x + b0 * x + p3 + 1e-9).toLong
          val corr = if (width == 0) 0L else words.getSigned(off, width)
          out(pos) = approx + corr - sh
          off += width; i += 1; pos += 1
        }
    }
  }

  /** Algorithm 2: decompress the whole series. */
  def decompressAll(): Array[Long] = {
    val out = new Array[Long](n)
    val m = numFragments
    var frag = 0
    while (frag < m) {
      val start = s(frag).toInt
      val end = if (frag + 1 < m) s(frag + 1).toInt else n
      val (kind, m0, b0, p3) = kindParamsOf(frag)
      val width = b(frag).toInt
      decodeRun(kind, m0, b0, p3, start, end, width, o(frag), out, start)
      frag += 1
    }
    out
  }

  /** Range scan [from, from+len): one rank, then sequential decoding. */
  def range(from: Int, len: Int): Array[Long] = {
    require(from >= 0 && len >= 0 && from + len <= n, s"range [$from, ${from + len}) out of [0, $n)")
    val out = new Array[Long](len)
    if (len == 0) return out
    var frag = s.rank(from) - 1
    var i = from
    var written = 0
    while (written < len) {
      val end0 = if (frag + 1 < numFragments) s(frag + 1).toInt else n
      val end = math.min(end0, from + len)
      val start = s(frag).toInt
      val (kind, m0, b0, p3) = kindParamsOf(frag)
      val width = b(frag).toInt
      val off = o(frag) + (i - start).toLong * width
      decodeRun(kind, m0, b0, p3, i, end, width, off, out, written)
      written += end - i
      i = end
      frag += 1
    }
    out
  }

  /** Size of the in-memory succinct structures, in bits. */
  def sizeInBits: Long =
    2L * 64 + s.sizeInBits + b.sizeInBits + o.sizeInBits + c.lengthInBits +
      k.sizeInBits + p.map(_.length.toLong * 64 + 32).sum

  /** Serialize to bytes (the on-disk/"row-group" form used by the Spark layer). */
  def toBytes: Array[Byte] = {
    val bos = new java.io.ByteArrayOutputStream()
    val out = new java.io.DataOutputStream(bos)
    out.writeInt(n)
    out.writeLong(shift)
    val m = numFragments
    out.writeInt(m)
    // starts, widths, offsets, kinds as plain arrays; re-built on load
    var i = 0
    while (i < m) { out.writeInt(s(i).toInt); i += 1 }
    i = 0
    while (i < m) { out.writeByte(b(i).toInt); i += 1 }
    i = 0
    while (i <= m) { out.writeLong(o(i)); i += 1 }
    i = 0
    while (i < m) { out.writeByte(k(i)); i += 1 }
    out.writeInt(p.length)
    p.foreach { arr =>
      out.writeInt(arr.length)
      arr.foreach(out.writeDouble)
    }
    val words = c.words
    out.writeLong(c.lengthInBits)
    out.writeInt(words.length)
    words.foreach(out.writeLong)
    out.flush()
    bos.toByteArray
  }
}

object NeaTSCompressed {

  /** Assemble the layout from the partitioner's pieces and the raw values. */
  def build(ys: Array[Long], shift: Long, pieces: Vector[Piece]): NeaTSCompressed = {
    val m = pieces.length
    val starts = pieces.map(_.start.toLong).toArray
    val widths = pieces.map(_.corrBits.toLong).toArray
    val kinds = pieces.map(_.kind.id).toArray
    val offsets = new Array[Long](m + 1)
    var acc = 0L
    var i = 0
    while (i < m) {
      offsets(i) = acc
      acc += pieces(i).length.toLong * pieces(i).corrBits
      i += 1
    }
    offsets(m) = acc

    val cw = new BitWriter(math.max(1, ((acc + 63) / 64).toInt))
    pieces.foreach { piece =>
      var idx = piece.start
      while (idx < piece.end) {
        val approx = math.floor(piece.eval(idx) + 1e-9).toLong
        val corr = (ys(idx) + shift) - approx
        require(math.abs(corr) <= piece.eps,
          s"correction $corr exceeds eps ${piece.eps} at $idx (kind ${piece.kind})")
        cw.append(corr, piece.corrBits)
        idx += 1
      }
    }

    val nKindIds = FunctionKind.all.map(_.id).max + 1
    val params = Array.fill(nKindIds)(scala.collection.mutable.ArrayBuffer[Double]())
    pieces.foreach { piece =>
      params(piece.kind.id) += piece.m
      params(piece.kind.id) += piece.b
      if (piece.kind.nParams == 3) params(piece.kind.id) += piece.p3
    }

    new NeaTSCompressed(
      ys.length, shift,
      EliasFano(starts),
      FixedWidthArray(widths, 6),
      EliasFano(offsets),
      new BitReader(cw.words, cw.lengthInBits),
      WaveletTree(kinds, nKindIds),
      params.map(_.toArray),
    )
  }

  def fromBytes(bytes: Array[Byte]): NeaTSCompressed = {
    val in = new java.io.DataInputStream(new java.io.ByteArrayInputStream(bytes))
    val n = in.readInt()
    val shift = in.readLong()
    val m = in.readInt()
    val starts = Array.fill(m)(in.readInt().toLong)
    val widths = Array.fill(m)(in.readByte().toLong)
    val offsets = Array.fill(m + 1)(in.readLong())
    val kinds = Array.fill(m)(in.readByte().toInt)
    val nKinds = in.readInt()
    val params = Array.fill(nKinds) {
      val len = in.readInt()
      Array.fill(len)(in.readDouble())
    }
    val bitLen = in.readLong()
    val nWords = in.readInt()
    val words = Array.fill(nWords)(in.readLong())
    new NeaTSCompressed(
      n, shift,
      EliasFano(starts),
      FixedWidthArray(widths, 6),
      EliasFano(offsets),
      new BitReader(words, bitLen),
      WaveletTree(kinds, math.max(1, FunctionKind.all.map(_.id).max + 1)),
      params,
    )
  }
}
