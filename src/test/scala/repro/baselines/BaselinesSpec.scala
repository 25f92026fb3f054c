package repro.baselines

import java.util.Random
import repro.SparkSpec
import repro.baselines.alp.ALPCodec
import repro.baselines.dac.DAC
import repro.baselines.gp._
import repro.baselines.leco.LeCo
import repro.baselines.xor._
import repro.data.TimeSeries

class XorCodecsSpec extends SparkSpec {
  private val codecs = Seq(GorillaCodec, ChimpCodec, Chimp128Codec, TSXorCodec)

  private def randomDoubles(n: Int, seed: Long): Array[Long] = {
    val rng = new Random(seed)
    var v = 100.0
    Array.fill(n) {
      v *= math.exp(rng.nextGaussian() * 0.01)
      java.lang.Double.doubleToRawLongBits(math.rint(v * 100) / 100)
    }
  }

  for (codec <- codecs) {
    test(s"${codec.name}: roundtrip on smooth double series") {
      val vs = randomDoubles(3000, 30)
      assert(codec.decompressBlock(codec.compressBlock(vs), vs.length).toSeq === vs.toSeq)
    }

    test(s"${codec.name}: roundtrip on adversarial bit patterns") {
      val rng = new Random(31)
      val vs = Array.fill(1000)(rng.nextLong()) ++
        Array(0L, -1L, Long.MinValue, Long.MaxValue, 0L, 0L, 1L) ++
        Array.fill(50)(42L)
      assert(codec.decompressBlock(codec.compressBlock(vs), vs.length).toSeq === vs.toSeq)
    }

    for (name <- TimeSeries.names) {
      test(s"${codec.name}: roundtrip on dataset analogue $name (doubles)") {
        val ds = TimeSeries.dataset(name, 700)
        val bits = Codec.doublesToBits(ds.values)
        assert(codec.decompressBlock(codec.compressBlock(bits), bits.length).toSeq === bits.toSeq)
      }
    }

    test(s"${codec.name}: block store random access") {
      val vs = randomDoubles(3500, 32)
      val store = new BlockStore(codec, vs)
      val rng = new Random(33)
      (0 until 200).foreach { _ =>
        val i = rng.nextInt(vs.length)
        assert(store.get(i) === vs(i))
      }
      assert(store.decompressAll().toSeq === vs.toSeq)
    }

    test(s"${codec.name}: compresses smooth data below 64 bits/value") {
      val vs = randomDoubles(5000, 34)
      val store = new BlockStore(codec, vs)
      assert(store.sizeInBits < vs.length.toLong * 64)
    }
  }

  test("single-value and empty-ish blocks") {
    for (codec <- codecs) {
      val one = Array(java.lang.Double.doubleToRawLongBits(3.25))
      assert(codec.decompressBlock(codec.compressBlock(one), 1).toSeq === one.toSeq)
    }
  }
}

class GeneralPurposeSpec extends SparkSpec {
  private val codecs = Seq(XzCodec, BrotliLikeCodec, ZstdCodec, Lz4Codec, SnappyCodec)

  for (codec <- codecs) {
    test(s"${codec.name}: roundtrip on longs") {
      val rng = new Random(35)
      var v = 100000L
      val vs = Array.fill(2500) { v += rng.nextInt(101) - 50; v }
      assert(codec.decompressBlock(codec.compressBlock(vs), vs.length).toSeq === vs.toSeq)
    }

    test(s"${codec.name}: block store random access") {
      val rng = new Random(36)
      val vs = Array.fill(3000)(rng.nextInt(1000).toLong)
      val store = new BlockStore(codec, vs)
      (0 until 100).foreach { _ =>
        val i = rng.nextInt(vs.length)
        assert(store.get(i) === vs(i))
      }
      assert(store.decompressAll().toSeq === vs.toSeq)
    }

    test(s"${codec.name}: compresses repetitive data") {
      val vs = Array.tabulate(4000)(i => (i % 16).toLong)
      val store = new BlockStore(codec, vs)
      assert(store.sizeInBits < vs.length.toLong * 64)
    }

    for (name <- TimeSeries.names) {
      test(s"${codec.name}: roundtrip on dataset analogue $name (integer view)") {
        val ds = TimeSeries.dataset(name, 700)
        assert(codec.decompressBlock(codec.compressBlock(ds.longs), ds.n).toSeq === ds.longs.toSeq)
      }
    }
  }
}

class ALPSpec extends SparkSpec {

  test("pseudodecimal mode roundtrips fixed-precision doubles") {
    val rng = new Random(37)
    val vs = Array.fill(1000)(java.lang.Double.doubleToRawLongBits(
      math.rint((rng.nextDouble() * 2000 - 1000) * 100) / 100))
    assert(ALPCodec.decompressBlock(ALPCodec.compressBlock(vs), vs.length).toSeq === vs.toSeq)
  }

  test("exceptions preserve non-decimal doubles") {
    val rng = new Random(38)
    val vs = Array.tabulate(1000) { i =>
      if (i % 50 == 0) rng.nextLong() // arbitrary bits as exceptions
      else java.lang.Double.doubleToRawLongBits(math.rint(rng.nextDouble() * 1e6) / 1000)
    }
    assert(ALPCodec.decompressBlock(ALPCodec.compressBlock(vs), vs.length).toSeq === vs.toSeq)
  }

  test("rd mode roundtrips high-entropy doubles") {
    val rng = new Random(39)
    val vs = Array.fill(1000)(java.lang.Double.doubleToRawLongBits(
      20.0 + rng.nextDouble())) // full-mantissa noise: pseudodecimal must bail
    assert(ALPCodec.decompressBlock(ALPCodec.compressBlock(vs), vs.length).toSeq === vs.toSeq)
  }

  for (name <- TimeSeries.names) {
    test(s"roundtrip through the block store on dataset analogue $name") {
      val ds = TimeSeries.dataset(name, 1000)
      val bits = Codec.doublesToBits(ds.values)
      val store = new BlockStore(ALPCodec, bits)
      assert(store.decompressAll().toSeq === bits.toSeq)
    }
  }

  test("fixed-precision data compresses well (the ALP sweet spot)") {
    val ds = TimeSeries.dataset("US", 4000)
    val store = new BlockStore(ALPCodec, Codec.doublesToBits(ds.values))
    assert(store.sizeInBits < ds.n.toLong * 40, s"got ${store.sizeInBits.toDouble / ds.n} bits/value")
  }

  test("special values (NaN, infinities, -0.0) survive") {
    val vs = Array(1.5, Double.NaN, Double.PositiveInfinity, -0.0, 2.25, Double.NegativeInfinity)
      .map(java.lang.Double.doubleToRawLongBits) ++
      Array.fill(100)(java.lang.Double.doubleToRawLongBits(7.75))
    assert(ALPCodec.decompressBlock(ALPCodec.compressBlock(vs), vs.length).toSeq === vs.toSeq)
  }
}

class LeCoSpec extends SparkSpec {

  test("roundtrip on linear-ish data") {
    val rng = new Random(40)
    val vs = Array.tabulate(5000)(i => 13L * i + rng.nextInt(21))
    val c = LeCo.compress(vs)
    assert(c.decompressAll().toSeq === vs.toSeq)
  }

  test("random access equals sequential") {
    val rng = new Random(41)
    var v = 0L
    val vs = Array.fill(4000) { v += rng.nextInt(101) - 50; v }
    val c = LeCo.compress(vs)
    val all = c.decompressAll()
    assert(all.toSeq === vs.toSeq)
    (0 until 300).foreach { _ =>
      val i = rng.nextInt(vs.length)
      assert(c.get(i) === vs(i))
    }
  }

  for (name <- TimeSeries.names) {
    test(s"roundtrip on dataset analogue $name (integer view)") {
      val ds = TimeSeries.dataset(name, 900)
      val c = LeCo.compress(ds.longs)
      assert(c.decompressAll().toSeq === ds.longs.toSeq)
    }
  }

  test("compresses linear data far below 64 bits/value") {
    val vs = Array.tabulate(10000)(i => 7L * i + 3)
    val c = LeCo.compress(vs)
    assert(c.sizeInBits < vs.length * 8L, s"got ${c.sizeInBits.toDouble / vs.length} bits/value")
  }

  test("negative values roundtrip") {
    val rng = new Random(42)
    var v = -100000L
    val vs = Array.fill(2000) { v += rng.nextInt(11) - 5; v }
    val c = LeCo.compress(vs)
    assert(c.decompressAll().toSeq === vs.toSeq)
  }
}

class DACSpec extends SparkSpec {

  test("roundtrip with native random access") {
    val rng = new Random(43)
    val vs = Array.fill(3000)(rng.nextLong() >> rng.nextInt(56))
    val c = DAC.compress(vs)
    assert(c.decompressAll().toSeq === vs.toSeq)
    (0 until 300).foreach { _ =>
      val i = rng.nextInt(vs.length)
      assert(c.get(i) === vs(i))
    }
  }

  test("zigzag mapping") {
    assert(DAC.zigzag(0) === 0L)
    assert(DAC.zigzag(-1) === 1L)
    assert(DAC.zigzag(1) === 2L)
    assert(DAC.unzigzag(DAC.zigzag(Long.MinValue / 2)) === Long.MinValue / 2)
    val rng = new Random(44)
    (0 until 1000).foreach { _ =>
      val v = rng.nextLong()
      assert(DAC.unzigzag(DAC.zigzag(v)) === v)
    }
  }

  test("small values use few levels (compression on small ints)") {
    val rng = new Random(45)
    val vs = Array.fill(4000)(rng.nextInt(200).toLong)
    val c = DAC.compress(vs)
    assert(c.decompressAll().toSeq === vs.toSeq)
    assert(c.sizeInBits < vs.length.toLong * 20, s"got ${c.sizeInBits.toDouble / vs.length} bits/value")
  }

  for (name <- TimeSeries.names) {
    test(s"roundtrip with native access on dataset analogue $name") {
      val ds = TimeSeries.dataset(name, 800)
      val c = DAC.compress(ds.longs)
      assert(c.decompressAll().toSeq === ds.longs.toSeq)
      assert(c.get(ds.n / 2) === ds.longs(ds.n / 2))
    }
  }

  test("extreme values roundtrip") {
    val vs = Array(Long.MaxValue, Long.MinValue, 0L, -1L, 1L, Long.MaxValue - 1)
    val c = DAC.compress(vs)
    assert(c.decompressAll().toSeq === vs.toSeq)
  }
}
