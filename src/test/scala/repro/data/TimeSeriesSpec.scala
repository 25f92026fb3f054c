package repro.data

import repro.SparkSpec

class TimeSeriesSpec extends SparkSpec {

  for (name <- TimeSeries.names) {
    test(s"$name: deterministic, right length, fixed precision") {
      val a = TimeSeries.dataset(name, 500)
      val b = TimeSeries.dataset(name, 500)
      assert(a.values.toSeq === b.values.toSeq, "generators must be deterministic")
      assert(a.n === 500)
      val scale = math.pow(10, a.digits)
      a.values.foreach { v =>
        assert(math.abs(math.rint(v * scale) / scale - v) < 1e-12, s"$v not $a.digits-digit")
      }
    }
  }

  test("long view is value * 10^digits") {
    val ds = TimeSeries.dataset("US", 300)
    val scale = math.pow(10, ds.digits)
    ds.values.zip(ds.longs).foreach { case (v, l) =>
      assert(l === math.round(v * scale))
    }
  }

  test("benchmark set covers all 16 names in the paper's size order") {
    assert(TimeSeries.names.size === 16)
    assert(TimeSeries.names.toSet.size === 16)
    val sizes = TimeSeries.benchSizes.map(_._2)
    assert(sizes === sizes.sorted.reverse, "bench sizes must be non-increasing like the paper")
  }

  test("value ranges are non-degenerate") {
    for (name <- TimeSeries.names) {
      val ds = TimeSeries.dataset(name, 400)
      assert(ds.valueRange > 0, s"$name is constant?")
    }
  }

  test("scaled benchmarks shrink proportionally") {
    val full = TimeSeries.benchmarks(0.01)
    assert(full.size === 16)
    full.zip(TimeSeries.benchSizes).foreach { case (ds, (name, n)) =>
      assert(ds.name === name)
      assert(ds.n === math.max(64, n / 100))
    }
  }
}
