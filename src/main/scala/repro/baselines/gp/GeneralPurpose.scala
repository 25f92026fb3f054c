package repro.baselines.gp

import repro.baselines.{BlockCodec, Codec}

/** The five general-purpose lossless compressors of §IV (byte-oriented,
  * applied to the little-endian bytes of the 64-bit values).
  *
  * Xz, Zstd, Lz4 and Snappy use the real libraries shipped in Spark's jar
  * directory (org.tukaani xz, zstd-jni, lz4-java, snappy-java). Brotli has
  * no JVM implementation available offline, so it is substituted by JDK
  * Deflate at maximum level — the same trade-off corner (slow, high-ratio
  * LZ77 + entropy coding); see DESIGN.md §4.
  */
abstract class BytesCodec extends BlockCodec {
  def compressBytes(bytes: Array[Byte]): Array[Byte]
  def decompressBytes(bytes: Array[Byte], originalLen: Int): Array[Byte]

  final def compressBlock(values: Array[Long]): Array[Byte] =
    compressBytes(Codec.longsToBytes(values))
  final def decompressBlock(bytes: Array[Byte], count: Int): Array[Long] =
    Codec.bytesToLongs(decompressBytes(bytes, count * 8), count)
}

object XzCodec extends BytesCodec {
  val name = "Xz"
  import org.tukaani.xz.{LZMA2Options, XZInputStream, XZOutputStream}
  def compressBytes(bytes: Array[Byte]): Array[Byte] = {
    val bos = new java.io.ByteArrayOutputStream()
    val xz = new XZOutputStream(bos, new LZMA2Options(6))
    xz.write(bytes); xz.finish(); xz.close()
    bos.toByteArray
  }
  def decompressBytes(bytes: Array[Byte], originalLen: Int): Array[Byte] = {
    val in = new XZInputStream(new java.io.ByteArrayInputStream(bytes))
    val out = new Array[Byte](originalLen)
    var off = 0
    var read = 0
    while (off < originalLen && read >= 0) {
      read = in.read(out, off, originalLen - off)
      if (read > 0) off += read
    }
    in.close()
    out
  }
}

/** Brotli stand-in: JDK Deflate at best compression (see DESIGN.md §4). */
object BrotliLikeCodec extends BytesCodec {
  val name = "Brotli*"
  def compressBytes(bytes: Array[Byte]): Array[Byte] = {
    val d = new java.util.zip.Deflater(java.util.zip.Deflater.BEST_COMPRESSION)
    d.setInput(bytes); d.finish()
    val buf = new Array[Byte](bytes.length + 64)
    val bos = new java.io.ByteArrayOutputStream()
    while (!d.finished()) {
      val m = d.deflate(buf)
      bos.write(buf, 0, m)
    }
    d.end()
    bos.toByteArray
  }
  def decompressBytes(bytes: Array[Byte], originalLen: Int): Array[Byte] = {
    val inf = new java.util.zip.Inflater()
    inf.setInput(bytes)
    val out = new Array[Byte](originalLen)
    var off = 0
    while (!inf.finished() && off < originalLen)
      off += inf.inflate(out, off, originalLen - off)
    inf.end()
    out
  }
}

object ZstdCodec extends BytesCodec {
  val name = "Zstd"
  def compressBytes(bytes: Array[Byte]): Array[Byte] =
    com.github.luben.zstd.Zstd.compress(bytes, 3)
  def decompressBytes(bytes: Array[Byte], originalLen: Int): Array[Byte] =
    com.github.luben.zstd.Zstd.decompress(bytes, originalLen)
}

object Lz4Codec extends BytesCodec {
  val name = "Lz4"
  private val factory = net.jpountz.lz4.LZ4Factory.fastestJavaInstance()
  def compressBytes(bytes: Array[Byte]): Array[Byte] =
    factory.fastCompressor().compress(bytes)
  def decompressBytes(bytes: Array[Byte], originalLen: Int): Array[Byte] =
    factory.fastDecompressor().decompress(bytes, originalLen)
}

object SnappyCodec extends BytesCodec {
  val name = "Snappy"
  def compressBytes(bytes: Array[Byte]): Array[Byte] =
    org.xerial.snappy.Snappy.compress(bytes)
  def decompressBytes(bytes: Array[Byte], originalLen: Int): Array[Byte] =
    org.xerial.snappy.Snappy.uncompress(bytes)
}
