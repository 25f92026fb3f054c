package repro.baselines.dac

import repro.baselines.CompressedSeq
import repro.core.bits.{BitVector, FixedWidthArray}

/** Directly Addressable Codes [Brisaboa, Ladra, Navarro, IPM'13]: each value
  * is split into fixed-width chunks; level l stores the l-th chunk of every
  * value that is long enough, plus a bitvector flagging continuation. Access
  * walks the levels with rank1 — O(levels), no block decompression, which is
  * what makes DAC the fastest random-access competitor in the paper.
  *
  * Values are zig-zag mapped first so negatives stay short.
  */
final class DACCompressed(
    val n: Int,
    chunkBits: Int,
    chunks: Array[FixedWidthArray],
    flags: Array[BitVector],
) extends CompressedSeq {

  def sizeInBits: Long =
    16 + chunks.map(_.sizeInBits).sum + flags.map(_.sizeInBits).sum

  def get(i: Int): Long = {
    var v = 0L
    var pos = i.toLong
    var level = 0
    var more = true
    while (more) {
      v |= chunks(level)(pos.toInt) << (level * chunkBits)
      if (level < flags.length && flags(level)(pos)) {
        pos = flags(level).rank1(pos)
        level += 1
      } else more = false
    }
    DAC.unzigzag(v)
  }

  def decompressAll(): Array[Long] = {
    val out = new Array[Long](n)
    var i = 0
    while (i < n) { out(i) = get(i); i += 1 }
    out
  }
}

object DAC {
  def zigzag(v: Long): Long = (v << 1) ^ (v >> 63)
  def unzigzag(v: Long): Long = (v >>> 1) ^ -(v & 1)

  def compress(values: Array[Long], chunkBits: Int = 8): DACCompressed = {
    val zz = values.map(zigzag)
    val levelChunks = scala.collection.mutable.ArrayBuffer[FixedWidthArray]()
    val levelFlags = scala.collection.mutable.ArrayBuffer[BitVector]()
    var current: Array[Long] = zz
    var shiftTotal = 0
    while (current.nonEmpty) {
      val mask = (1L << chunkBits) - 1
      val chunk = current.map(_ & mask)
      val continues = current.map(v => (v >>> chunkBits) != 0)
      levelChunks += FixedWidthArray(chunk, chunkBits)
      val isLast = shiftTotal + chunkBits >= 64 || !continues.exists(identity)
      if (!isLast) {
        levelFlags += BitVector.fromBooleans(continues.toIndexedSeq)
        current = current.zip(continues).collect { case (v, true) => v >>> chunkBits }
        shiftTotal += chunkBits
      } else {
        // last level: no continuation bitvector needed
        if (continues.exists(identity))
          throw new IllegalStateException("value does not fit remaining levels")
        current = Array.empty
      }
    }
    new DACCompressed(values.length, chunkBits, levelChunks.toArray, levelFlags.toArray)
  }
}
