package repro.core.approx

import scala.collection.mutable.ArrayBuffer

/** Corollary 1: the piecewise eps-approximation of a whole series with the
  * minimum number of fragments of a single function kind, via repeated
  * longest-fragment fitting (greedy is optimal for interval covering).
  */
object PiecewiseApprox {

  def partition(ys: Array[Long], shift: Long, kind: FunctionKind, eps: Long): Vector[Fit] = {
    val out = new ArrayBuffer[Fit]()
    val scratch = new FeasibleRegion
    var start = 0
    while (start < ys.length) {
      val fit = ConvexFit.longestFragment(ys, shift, start, kind, eps, scratch)
      require(fit.end > start, s"kind $kind cannot cover point $start (shift too small?)")
      out += fit
      start = fit.end
    }
    out.toVector
  }

  /** Max absolute error of a set of fragments covering `ys` (diagnostic). */
  def maxError(ys: Array[Long], shift: Long, fits: Seq[Fit]): Double =
    fits.iterator.flatMap { f =>
      (f.start until f.end).iterator.map(i => math.abs(f.eval(i) - (ys(i) + shift).toDouble))
    }.foldLeft(0.0)(math.max)
}
