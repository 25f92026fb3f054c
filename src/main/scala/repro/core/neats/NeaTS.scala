package repro.core.neats

import repro.core.approx._

/** Top-level NeaTS compressor (lossless + lossy) and its speed-oriented
  * variants LeaTS (linear functions only) and SNeaTS (model selection of the
  * top-5 most used (kind, eps) pairs on a prefix sample), per §IV-C1.
  */
object NeaTS {

  val defaultKinds: Vector[FunctionKind] = FunctionKind.all

  /** One eps per achievable correction width, up to the value range
    * D = max - min + 1 (the paper's complexity analysis uses the grid
    * {0, 2, ..., 2^ceil(log D)} of the same size). For a width of b bits the
    * largest representable eps is 2^(b-1) - 1, so the grid {0, 1, 3, 7, ...}
    * gets the longest fragments possible at each storage cost.
    */
  def epsGrid(ys: Array[Long]): Seq[Long] = {
    if (ys.isEmpty) return Seq(0L)
    val delta = math.max(1L, ys.max - ys.min + 1)
    val maxExp = math.min(40, 64 - java.lang.Long.numberOfLeadingZeros(delta - 1).toInt) // ceil(log2 delta)
    0L +: (1 to math.max(1, maxExp)).map(k => (1L << k) - 1)
  }

  /** Global value shift so every y' = y + shift >= epsMax + 1 > 0 (footnote 2),
    * keeping log-space kinds in-domain for every eps in the grid.
    */
  def shiftFor(ys: Array[Long], epsMax: Long): Long = {
    if (ys.isEmpty) return 0L
    val mn = ys.min
    math.max(0L, epsMax + 1 - mn)
  }

  /** Lossless compression with the given kinds and eps grid. */
  def compress(ys: Array[Long],
               kinds: Seq[FunctionKind] = defaultKinds,
               epsilons: Option[Seq[Long]] = None): NeaTSCompressed = {
    val eps = epsilons.getOrElse(epsGrid(ys)).distinct.sorted
    val shift = shiftFor(ys, eps.max)
    val pieces = Partitioner.lossless(ys, shift, kinds, eps)
    NeaTSCompressed.build(ys, shift, repair(ys, shift, pieces, lossy = false))
  }

  /** LeaTS: linear functions only (5x faster compression in the paper). */
  def compressLinearOnly(ys: Array[Long]): NeaTSCompressed =
    compress(ys, kinds = Seq(LinearKind))

  /** SNeaTS: run Algorithm 1 on the first `sampleFrac` of the series, keep the
    * top-`keep` most-used (kind, eps) pairs (always retaining a linear pair as
    * a safety net), then compress the full series with just those.
    */
  def compressSelected(ys: Array[Long], sampleFrac: Double = 0.10, keep: Int = 5): NeaTSCompressed = {
    val eps = epsGrid(ys).distinct.sorted
    val shift = shiftFor(ys, eps.max)
    val sampleLen = math.max(64, math.min(ys.length, (ys.length * sampleFrac).toInt))
    val sample = ys.take(sampleLen)
    val samplePieces = Partitioner.lossless(sample, shift, defaultKinds, eps)
    val counts = samplePieces
      .groupBy(p => (p.kind, p.eps))
      .map { case (pair, ps) => pair -> ps.map(_.length).sum }
      .toSeq.sortBy(-_._2)
    var selected = counts.take(keep).map(_._1)
    if (!selected.exists(_._1 == LinearKind))
      selected = selected :+ (LinearKind, eps.max)
    val kinds = selected.map(_._1).distinct
    val epsSel = selected.map(_._2).distinct
    val pieces = Partitioner.lossless(ys, shift, kinds, epsSel)
    NeaTSCompressed.build(ys, shift, repair(ys, shift, pieces, lossy = false))
  }

  /** NeaTS-L: lossy compression under a single error bound eps; the output is
    * the same layout with zero-width corrections (decompression returns the
    * approximation, max error <= eps).
    */
  def compressLossy(ys: Array[Long], eps: Long,
                    kinds: Seq[FunctionKind] = defaultKinds): NeaTSCompressed = {
    val shift = shiftFor(ys, eps)
    val pieces = Partitioner.lossyPartition(ys, shift, kinds, eps)
    NeaTSCompressed.build(ys, shift, repair(ys, shift, pieces, lossy = true))
  }

  /** Lossy partition only (for Table II size accounting and MAPE). */
  def lossyPieces(ys: Array[Long], eps: Long,
                  kinds: Seq[FunctionKind] = defaultKinds): Vector[Piece] = {
    val shift = shiftFor(ys, eps)
    repair(ys, shift, Partitioner.lossyPartition(ys, shift, kinds, eps), lossy = true)
  }

  /** Floating-point safety net: the convex fitting runs on doubles, so a
    * correction can in rare cases land just outside [-eps, eps]. Verify each
    * piece; at the first violation, keep the valid prefix, re-fit the tail
    * with the same (kind, eps), and (for an immediate violation) fall back to
    * an exact single-point linear piece. Only ever splits pieces, preserving
    * correctness; measured impact on size is negligible.
    */
  private[neats] def repair(ys: Array[Long], shift: Long,
                            pieces: Vector[Piece], lossy: Boolean): Vector[Piece] = {
    val out = scala.collection.mutable.ArrayBuffer[Piece]()
    pieces.foreach { piece =>
      var cur = piece
      var doneWithPiece = false
      while (!doneWithPiece) {
        var v = cur.start
        var violation = -1
        while (v < cur.end && violation < 0) {
          val approx = math.floor(cur.eval(v) + 1e-9).toLong
          if (math.abs((ys(v) + shift) - approx) > cur.eps) violation = v
          v += 1
        }
        if (violation < 0) { out += cur; doneWithPiece = true }
        else if (violation > cur.start) {
          out += cur.copy(end = violation)
          cur = refit(ys, shift, violation, cur.end, cur.kind, cur.eps, lossy)
        } else {
          // violation at the very first point: exact constant (linear) piece
          out += Piece(cur.start, cur.start + 1, LinearKind,
                       0.0, (ys(cur.start) + shift).toDouble, 0.0,
                       cur.eps, if (lossy) 0 else Partitioner.corrBits(cur.eps))
          if (cur.start + 1 < cur.end)
            cur = refit(ys, shift, cur.start + 1, cur.end, cur.kind, cur.eps, lossy)
          else doneWithPiece = true
        }
      }
    }
    out.toVector
  }

  private def refit(ys: Array[Long], shift: Long, start: Int, end: Int,
                    kind: FunctionKind, eps: Long, lossy: Boolean): Piece = {
    val fit = ConvexFit.longestFragment(ys, shift, start, kind, eps)
    val e = math.max(start + 1, math.min(fit.end, end))
    Piece(start, e, kind, fit.m, fit.b, fit.p3, eps,
          if (lossy) 0 else Partitioner.corrBits(eps))
  }
}
