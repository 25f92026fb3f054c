package repro.core.bits

import java.util.Random
import repro.SparkSpec

class BitsSpec extends SparkSpec {

  test("BitWriter/BitReader roundtrip of mixed widths") {
    val rng = new Random(1)
    val items = Seq.fill(2000) {
      val w = rng.nextInt(65)
      val v = if (w == 0) 0L else rng.nextLong() & (if (w == 64) -1L else (1L << w) - 1)
      (v, w)
    }
    val bw = new BitWriter()
    items.foreach { case (v, w) => bw.append(v, w) }
    val r = new BitReader(bw.words, bw.lengthInBits)
    var pos = 0L
    items.foreach { case (v, w) =>
      assert(r.get(pos, w) === v, s"at pos $pos width $w")
      pos += w
    }
    assert(pos === bw.lengthInBits)
  }

  test("BitWriter appendBit and getBit agree") {
    val rng = new Random(2)
    val bits = Seq.fill(500)(rng.nextBoolean())
    val bw = new BitWriter()
    bits.foreach(bw.appendBit)
    val r = new BitReader(bw.words, bw.lengthInBits)
    bits.zipWithIndex.foreach { case (b, i) => assert(r.getBit(i.toLong) === b) }
  }

  test("BitReader getSigned sign-extends") {
    val bw = new BitWriter()
    val values = Seq((-3L, 3), (3L, 3), (-1L, 1), (0L, 5), (-128L, 8), (127L, 8), (-1000L, 11))
    values.foreach { case (v, w) => bw.append(v, w) }
    val r = new BitReader(bw.words, bw.lengthInBits)
    var pos = 0L
    values.foreach { case (v, w) =>
      assert(r.getSigned(pos, w) === v, s"value $v width $w")
      pos += w
    }
  }

  test("appendZeros skips bits correctly") {
    val bw = new BitWriter()
    bw.append(5L, 3)
    bw.appendZeros(100)
    bw.append(7L, 3)
    val r = new BitReader(bw.words, bw.lengthInBits)
    assert(r.get(0, 3) === 5L)
    assert(r.get(3, 64) === 0L)
    assert(r.get(103, 3) === 7L)
  }

  test("width 64 values including negatives roundtrip") {
    val bw = new BitWriter()
    val vs = Seq(Long.MinValue, Long.MaxValue, -1L, 0L, 42L)
    vs.foreach(v => bw.append(v, 64))
    val r = new BitReader(bw.words, bw.lengthInBits)
    vs.zipWithIndex.foreach { case (v, i) => assert(r.get(i * 64L, 64) === v) }
  }

  test("FixedWidthArray stores and retrieves") {
    val rng = new Random(3)
    for (width <- Seq(1, 3, 7, 13, 31, 63)) {
      val mask = (1L << width) - 1
      val vs = Array.fill(300)(rng.nextLong() & mask)
      val fwa = FixedWidthArray(vs, width)
      assert(fwa.length === 300)
      vs.zipWithIndex.foreach { case (v, i) => assert(fwa(i) === v, s"width $width idx $i") }
    }
  }

  test("FixedWidthArray.auto picks minimal sufficient width") {
    assert(FixedWidthArray.bitsFor(0) === 1)
    assert(FixedWidthArray.bitsFor(1) === 1)
    assert(FixedWidthArray.bitsFor(2) === 2)
    assert(FixedWidthArray.bitsFor(255) === 8)
    assert(FixedWidthArray.bitsFor(256) === 9)
    val vs = Array(0L, 5L, 255L)
    val fwa = FixedWidthArray.auto(vs)
    assert(fwa.width === 8)
    assert(fwa.toArray.toSeq === vs.toSeq)
  }

  test("FixedWidthArray rejects out-of-range access") {
    val fwa = FixedWidthArray(Array(1L, 2L), 2)
    intercept[IllegalArgumentException](fwa(-1))
    intercept[IllegalArgumentException](fwa(2))
  }
}

class BitVectorSpec extends SparkSpec {
  private def naive(bits: Seq[Boolean]) = bits

  private def checkAll(bits: Seq[Boolean]): Unit = {
    val bv = BitVector.fromBooleans(bits)
    assert(bv.length === bits.length)
    val prefOnes = bits.scanLeft(0L)((acc, b) => acc + (if (b) 1 else 0))
    (0 to bits.length).foreach(i => assert(bv.rank1(i.toLong) === prefOnes(i), s"rank1($i)"))
    (0 to bits.length).foreach(i => assert(bv.rank0(i.toLong) === i - prefOnes(i), s"rank0($i)"))
    val onePos = bits.zipWithIndex.filter(_._1).map(_._2)
    onePos.zipWithIndex.foreach { case (p, j) => assert(bv.select1(j.toLong) === p.toLong, s"select1($j)") }
    val zeroPos = bits.zipWithIndex.filterNot(_._1).map(_._2)
    zeroPos.zipWithIndex.foreach { case (p, j) => assert(bv.select0(j.toLong) === p.toLong, s"select0($j)") }
    bits.zipWithIndex.foreach { case (b, i) => assert(bv(i.toLong) === b) }
  }

  test("rank/select on random vectors of several lengths") {
    val rng = new Random(4)
    for (len <- Seq(1, 7, 63, 64, 65, 511, 512, 513, 2000)) {
      checkAll(Seq.fill(len)(rng.nextBoolean()))
    }
  }

  test("rank/select on sparse and dense vectors") {
    val rng = new Random(5)
    checkAll(Seq.fill(1500)(rng.nextInt(100) == 0)) // sparse
    checkAll(Seq.fill(1500)(rng.nextInt(100) != 0)) // dense
    checkAll(Seq.fill(700)(true))
    checkAll(Seq.fill(700)(false))
  }

  test("fromPositions equals fromBooleans") {
    val rng = new Random(6)
    val bits = Seq.fill(1000)(rng.nextInt(3) == 0)
    val pos = bits.zipWithIndex.filter(_._1).map(_._2.toLong)
    val a = BitVector.fromBooleans(bits)
    val b = BitVector.fromPositions(bits.length.toLong, pos)
    (0 until bits.length).foreach(i => assert(a(i.toLong) === b(i.toLong)))
    assert(a.countOnes === b.countOnes)
  }

  test("select bounds are enforced") {
    val bv = BitVector.fromBooleans(Seq(true, false, true))
    intercept[IllegalArgumentException](bv.select1(2))
    intercept[IllegalArgumentException](bv.select0(1))
  }
}

class EliasFanoSpec extends SparkSpec {

  private def check(values: Array[Long]): Unit = {
    val ef = EliasFano(values)
    assert(ef.length === values.length)
    values.zipWithIndex.foreach { case (v, i) => assert(ef(i) === v, s"access($i)") }
    // rank over a probe set: all values +- 1 and random points
    val probes = values.flatMap(v => Seq(v - 1, v, v + 1)).filter(_ >= 0) ++ Seq(0L)
    probes.foreach { q =>
      val expected = values.count(_ <= q)
      assert(ef.rank(q) === expected, s"rank($q)")
    }
  }

  test("monotone random sequences roundtrip with rank") {
    val rng = new Random(7)
    for (n <- Seq(1, 2, 10, 100, 1000)) {
      val vs = Array.iterate(rng.nextInt(10).toLong, n)(v => v + rng.nextInt(50))
      check(vs)
    }
  }

  test("sequences with repeats") {
    check(Array(0L, 0L, 0L, 5L, 5L, 9L, 9L, 9L, 9L))
    check(Array.fill(100)(7L))
    check(Array(0L))
  }

  test("dense sequence (consecutive integers)") {
    check(Array.tabulate(500)(_.toLong))
  }

  test("sparse sequence (large universe)") {
    val rng = new Random(8)
    val vs = Array.iterate(1000000L, 200)(v => v + 1 + rng.nextInt(1000000))
    check(vs)
  }

  test("predecessor works") {
    val ef = EliasFano(Array(2L, 5L, 9L))
    assert(ef.predecessor(9) === 9L)
    assert(ef.predecessor(8) === 5L)
    assert(ef.predecessor(2) === 2L)
    assert(ef.rank(1) === 0)
  }
}

class WaveletTreeSpec extends SparkSpec {

  private def check(symbols: Array[Int], sigma: Int): Unit = {
    val wt = WaveletTree(symbols, sigma)
    symbols.zipWithIndex.foreach { case (s, i) => assert(wt(i) === s, s"access($i)") }
    for (sym <- 0 until sigma; i <- 0 to symbols.length by math.max(1, symbols.length / 50)) {
      val expected = symbols.take(i).count(_ == sym)
      assert(wt.rank(sym, i) === expected, s"rank($sym, $i)")
    }
  }

  test("random strings over alphabets of size 2..9") {
    val rng = new Random(9)
    for (sigma <- 2 to 9) check(Array.fill(800)(rng.nextInt(sigma)), sigma)
  }

  test("single-symbol alphabet") {
    check(Array.fill(50)(0), 1)
  }

  test("the NeaTS use case: kind string over 4 kinds") {
    val rng = new Random(10)
    val ks = Array.fill(3000)(rng.nextInt(4))
    val wt = WaveletTree(ks, 4)
    // exhaustive rank check for this central use
    val counts = Array.fill(4)(0)
    ks.zipWithIndex.foreach { case (s, i) =>
      (0 until 4).foreach(sym => assert(wt.rank(sym, i) === counts(sym)))
      counts(s) += 1
      assert(wt(i) === s)
    }
  }

  test("empty-ish and skewed strings") {
    check(Array(3), 4)
    check(Array.fill(100)(2) ++ Array.fill(100)(0), 4)
  }
}
