package repro.core.neats

import java.util.Random
import repro.SparkSpec
import repro.core.approx._
import repro.data.TimeSeries

class PartitionerSpec extends SparkSpec {

  private def randomWalk(n: Int, seed: Long): Array[Long] = {
    val rng = new Random(seed)
    var v = 10000L
    Array.fill(n) { v += rng.nextInt(21) - 10; v }
  }

  private def checkPartition(ys: Array[Long], shift: Long, pieces: Vector[Piece]): Unit = {
    assert(pieces.nonEmpty)
    assert(pieces.head.start === 0)
    assert(pieces.last.end === ys.length)
    pieces.sliding(2).foreach {
      case Vector(a, b) => assert(a.end === b.start, "pieces must be contiguous")
      case _ =>
    }
  }

  test("lossless partition covers the series contiguously") {
    val ys = randomWalk(1500, 17)
    val eps = Seq(0L, 2L, 8L, 32L)
    val shift = NeaTS.shiftFor(ys, eps.max)
    val pieces = Partitioner.lossless(ys, shift, FunctionKind.all, eps)
    checkPartition(ys, shift, pieces)
  }

  test("optimal partition cost is never worse than greedy single-kind cost") {
    val ys = randomWalk(1200, 18)
    val epsilons = Seq(0L, 2L, 8L, 32L)
    val shift = NeaTS.shiftFor(ys, epsilons.max)
    val pieces = Partitioner.lossless(ys, shift, FunctionKind.all, epsilons)
    val optCost = pieces.map(p => p.length.toLong * p.corrBits + Partitioner.kappa(p.kind)).sum
    // greedy linear at each single eps is a valid solution of the same problem
    epsilons.foreach { eps =>
      val greedy = PiecewiseApprox.partition(ys, shift, LinearKind, eps)
      val cost = greedy.map(f => f.length.toLong * Partitioner.corrBits(eps) +
        Partitioner.kappa(LinearKind)).sum
      assert(optCost <= cost, s"optimal $optCost > greedy(linear, eps=$eps) $cost")
    }
  }

  test("lossy partition minimises fragment storage and respects the bound") {
    val ys = randomWalk(1000, 19)
    val eps = 16L
    val shift = NeaTS.shiftFor(ys, eps)
    val pieces = Partitioner.lossyPartition(ys, shift, FunctionKind.all, eps)
    checkPartition(ys, shift, pieces)
    assert(pieces.forall(_.corrBits === 0))
    // lossy optimum (by kappa) must not exceed greedy linear fragment storage
    val optCost = pieces.map(p => Partitioner.kappa(p.kind)).sum
    val greedy = PiecewiseApprox.partition(ys, shift, LinearKind, eps)
    assert(optCost <= greedy.length * Partitioner.kappa(LinearKind))
  }

  test("corrBits matches ceil(log2(2eps+1))") {
    assert(Partitioner.corrBits(0) === 0)
    assert(Partitioner.corrBits(1) === 2)
    assert(Partitioner.corrBits(2) === 3)
    assert(Partitioner.corrBits(3) === 3)
    assert(Partitioner.corrBits(4) === 4)
    assert(Partitioner.corrBits(7) === 4)
    assert(Partitioner.corrBits(8) === 5)
    // signed two's complement must cover [-eps, eps]
    for (eps <- 1L to 200L) {
      val b = Partitioner.corrBits(eps)
      assert((1L << (b - 1)) - 1 >= eps || (1L << (b - 1)) >= eps, s"eps=$eps b=$b")
      assert(-(1L << (b - 1)) <= -eps)
      assert((1L << (b - 1)) - 1 >= eps, s"upper bound fails for eps=$eps b=$b")
    }
  }

  test("partition on a series with mixed regimes uses more than one kind") {
    // exponential growth then linear drift: the optimal partition should not
    // pay the linear-fragment price on the exponential half
    val ys = Array.tabulate(400)(i => math.round(10.0 * math.exp(0.02 * (i + 1)))) ++
      Array.tabulate(400)(i => 30000L + 5 * i)
    val eps = Seq(2L)
    val shift = NeaTS.shiftFor(ys, 2L)
    val all = Partitioner.lossless(ys, shift, FunctionKind.all, eps)
    val linOnly = Partitioner.lossless(ys, shift, Seq(LinearKind), eps)
    def cost(ps: Vector[Piece]) = ps.map(p => p.length.toLong * p.corrBits + Partitioner.kappa(p.kind)).sum
    assert(cost(all) <= cost(linOnly))
    assert(all.length <= linOnly.length)
  }

  test("single point and tiny series partition fine") {
    for (n <- Seq(1, 2, 3, 5)) {
      val ys = Array.tabulate(n)(i => (i * i).toLong)
      val pieces = Partitioner.lossless(ys, 10, FunctionKind.all, Seq(0L, 2L))
      checkPartition(ys, 10, pieces)
    }
  }
}

class NeaTSSpec extends SparkSpec {

  private def testDatasets = TimeSeries.names.map(n => TimeSeries.dataset(n, 1500))

  for (ds <- TimeSeries.names) {
    test(s"lossless roundtrip on dataset analogue $ds") {
      val data = TimeSeries.dataset(ds, 1200)
      val c = NeaTS.compress(data.longs)
      assert(c.decompressAll().toSeq === data.longs.toSeq)
    }
  }

  test("random access agrees with full decompression") {
    val data = TimeSeries.dataset("IT", 2000)
    val c = NeaTS.compress(data.longs)
    val all = c.decompressAll()
    val rng = new Random(20)
    (0 until 500).foreach { _ =>
      val i = rng.nextInt(data.n)
      assert(c(i) === all(i), s"random access at $i")
    }
    // and exhaustively on a prefix
    (0 until 300).foreach(i => assert(c(i) === all(i)))
  }

  test("range scans agree with full decompression") {
    val data = TimeSeries.dataset("ECG", 2000)
    val c = NeaTS.compress(data.longs)
    val all = c.decompressAll()
    val rng = new Random(21)
    (0 until 100).foreach { _ =>
      val from = rng.nextInt(data.n - 1)
      val len = rng.nextInt(data.n - from)
      assert(c.range(from, len).toSeq === all.slice(from, from + len).toSeq)
    }
    assert(c.range(0, 0).isEmpty)
    assert(c.range(0, data.n).toSeq === all.toSeq)
  }

  test("serialization roundtrips") {
    val data = TimeSeries.dataset("US", 1500)
    val c = NeaTS.compress(data.longs)
    val c2 = NeaTSCompressed.fromBytes(c.toBytes)
    assert(c2.decompressAll().toSeq === data.longs.toSeq)
    assert(c2.n === c.n)
    val rng = new Random(22)
    (0 until 200).foreach { _ =>
      val i = rng.nextInt(data.n)
      assert(c2(i) === c(i))
    }
  }

  test("LeaTS (linear only) roundtrips") {
    val data = TimeSeries.dataset("WD", 1500)
    val c = NeaTS.compressLinearOnly(data.longs)
    assert(c.decompressAll().toSeq === data.longs.toSeq)
  }

  test("SNeaTS (model selection) roundtrips") {
    val data = TimeSeries.dataset("AP", 2000)
    val c = NeaTS.compressSelected(data.longs)
    assert(c.decompressAll().toSeq === data.longs.toSeq)
  }

  test("compression actually compresses trend-heavy data") {
    val data = TimeSeries.dataset("US", 4000)
    val c = NeaTS.compress(data.longs)
    assert(c.sizeInBits < data.originalBits, s"${c.sizeInBits} vs ${data.originalBits}")
  }

  test("lossy: max error bounded by eps and smaller than lossless") {
    val data = TimeSeries.dataset("IT", 2000)
    // eps comfortably above the noise floor so the lossy form clearly wins
    val eps = math.max(1L, data.valueRange / 20)
    val lossy = NeaTS.compressLossy(data.longs, eps)
    val dec = lossy.decompressAll()
    val maxErr = dec.zip(data.longs).map { case (a, b) => math.abs(a - b) }.max
    assert(maxErr <= eps, s"maxErr $maxErr > eps $eps")
    val lossless = NeaTS.compress(data.longs)
    assert(lossy.sizeInBits < lossless.sizeInBits)
  }

  for (ds <- TimeSeries.names) {
    test(s"lossy pieces respect the bound on dataset analogue $ds") {
      val data = TimeSeries.dataset(ds, 1000)
      val eps = math.max(1L, data.valueRange / 200)
      val pieces = NeaTS.lossyPieces(data.longs, eps)
      val shift = NeaTS.shiftFor(data.longs, eps)
      pieces.foreach { p =>
        (p.start until p.end).foreach { i =>
          val approx = math.floor(p.eval(i) + 1e-9).toLong
          assert(math.abs(approx - (data.longs(i) + shift)) <= eps, s"piece at $i")
        }
      }
    }
  }

  for (ds <- TimeSeries.names) {
    test(s"LeaTS (linear-only) roundtrips on dataset analogue $ds") {
      val data = TimeSeries.dataset(ds, 800)
      val c = NeaTS.compressLinearOnly(data.longs)
      assert(c.decompressAll().toSeq === data.longs.toSeq)
    }
  }

  test("negative values are handled via the global shift") {
    val rng = new Random(23)
    var v = -5000L
    val ys = Array.fill(1000) { v += rng.nextInt(21) - 10; v }
    assert(ys.min < 0)
    val c = NeaTS.compress(ys)
    assert(c.decompressAll().toSeq === ys.toSeq)
  }

  test("constant series compresses to almost nothing") {
    val ys = Array.fill(5000)(42L)
    val c = NeaTS.compress(ys)
    assert(c.decompressAll().toSeq === ys.toSeq)
    assert(c.numFragments === 1)
    assert(c.sizeInBits < 5000L, s"constant series should be tiny, got ${c.sizeInBits} bits")
  }

  test("epsGrid covers {0} union width-maximal eps up to the value range") {
    val ys = Array[Long](0, 100, 1000) // delta = 1001 -> ceil(log2) = 10
    val grid = NeaTS.epsGrid(ys)
    assert(grid.head === 0L)
    assert(grid.tail === (1 to 10).map(k => (1L << k) - 1))
    // each eps is the largest one for its correction width
    grid.tail.foreach { e =>
      assert(Partitioner.corrBits(e + 1) === Partitioner.corrBits(e) + 1)
    }
  }

  test("shiftFor keeps log-domain kinds in-domain") {
    val ys = Array[Long](-10, 0, 5)
    val shift = NeaTS.shiftFor(ys, 8)
    assert(ys.min + shift === 8 + 1)
    val ys2 = Array[Long](100, 200)
    assert(NeaTS.shiftFor(ys2, 8) === 0L)
  }

  test("repair splits pieces with out-of-bound corrections") {
    val ys = Array.tabulate(100)(i => (i * 3).toLong)
    // a deliberately wrong piece: slope way off
    val bad = Vector(Piece(0, 100, LinearKind, 10.0, 0.0, 0.0, 2, Partitioner.corrBits(2)))
    val repaired = NeaTS.repair(ys, 0, bad, lossy = false)
    assert(repaired.head.start === 0)
    assert(repaired.last.end === 100)
    repaired.sliding(2).foreach {
      case Vector(a, b) => assert(a.end === b.start)
      case _ =>
    }
    repaired.foreach { p =>
      (p.start until p.end).foreach { i =>
        val approx = math.floor(p.eval(i) + 1e-9).toLong
        assert(math.abs(ys(i) - approx) <= p.eps)
      }
    }
  }

  test("wavelet-tree parameter lookup is consistent across kinds") {
    // build data that forces multiple kinds, then decode must still roundtrip
    val ys = Array.tabulate(300)(i => math.round(10.0 * math.exp(0.02 * (i + 1)))) ++
      Array.tabulate(300)(i => 5000L + 7 * i) ++
      Array.tabulate(300)(i => math.round(200.0 * math.sqrt(i + 1.0)))
    val c = NeaTS.compress(ys)
    assert(c.decompressAll().toSeq === ys.toSeq)
  }
}
