package repro.baselines.lossy

import repro.core.approx.{ConvexFit, Fit, LinearKind, PiecewiseApprox}

/** The optimal Piecewise Linear Approximation baseline [O'Rourke, CACM'81]:
  * greedy longest-fragment linear fitting, which minimises the number of
  * segments for a fixed error bound (Table II's PLA column).
  */
object PLA {
  def partition(ys: Array[Long], eps: Long): Vector[Fit] =
    PiecewiseApprox.partition(ys, shift = 0L, LinearKind, eps)

  /** Lossy size accounting used uniformly across Table II methods:
    * 2 params x 64 bits + 32-bit start per segment.
    */
  def sizeBits(fits: Seq[Fit]): Long = fits.length.toLong * (2 * 64 + 32)
}
