package repro.core.neats

import repro.core.approx._

/** One fragment of the final partition: points [start, end), approximated by
  * `kind` with stored parameters (m, b, p3) under error bound `eps`;
  * `corrBits` = ceil(log2(2*eps+1)) is the per-point correction width.
  */
final case class Piece(start: Int, end: Int, kind: FunctionKind,
                       m: Double, b: Double, p3: Double,
                       eps: Long, corrBits: Int) {
  def length: Int = end - start
  def eval(idx: Int): Double = kind.eval((idx + 1).toDouble, m, b, p3)
}

/** Algorithm 1: space-optimal partitioning of a time series into fragments,
  * each eps-approximated by some (kind, eps) in F x E.
  *
  * Shortest path on the DAG with one node per point boundary (0..n): every
  * live approximation J_{f,eps} spanning (i, j) contributes, at the visit of
  * node k in between, the prefix edge (i, k) and the suffix edge (k, j);
  * edge weight = exact encoded size (corrections + parameters + metadata).
  * Runs in O(|F| |E| n) amortised.
  */
object Partitioner {

  /** Correction width in bits for an error bound eps (paper: ceil(log(2e+1))).
    * Signed two's-complement in this many bits always covers [-eps, eps]
    * because 2*eps+1 is odd (so the ceiling rounds up past it).
    */
  def corrBits(eps: Long): Int =
    if (eps == 0) 0 else 64 - java.lang.Long.numberOfLeadingZeros(2 * eps) // ceil(log2(2e+1)) for e>=1

  /** Per-fragment overhead in bits: parameters + amortised metadata share
    * (S and O Elias-Fano entries, B width, K kind bits).
    */
  def kappa(kind: FunctionKind): Long = 64L * kind.nParams + 48L

  private val Inf = Long.MaxValue / 4

  /** Lossless partitioning (weights include the correction storage). */
  def lossless(ys: Array[Long], shift: Long,
               kinds: Seq[FunctionKind], epsilons: Seq[Long]): Vector[Piece] =
    run(ys, shift, kinds, epsilons, lossy = false)

  /** Lossy partitioning (single eps; weights are parameter storage only). */
  def lossyPartition(ys: Array[Long], shift: Long,
                     kinds: Seq[FunctionKind], eps: Long): Vector[Piece] =
    run(ys, shift, kinds, Seq(eps), lossy = true)

  private def run(ys: Array[Long], shift: Long, kinds: Seq[FunctionKind],
                  epsilons: Seq[Long], lossy: Boolean): Vector[Piece] = {
    val n = ys.length
    if (n == 0) return Vector.empty
    require(kinds.nonEmpty && epsilons.nonEmpty, "need at least one kind and eps")
    val pairs = (for { f <- kinds; e <- epsilons.distinct.sorted } yield (f, e)).toArray
    val nP = pairs.length
    val live = new Array[Fit](nP)
    val bitsPerPoint = pairs.map { case (_, e) => if (lossy) 0L else corrBits(e).toLong }
    val kap = pairs.map { case (f, _) => kappa(f) }

    val scratch = new repro.core.approx.FeasibleRegion
    val distance = Array.fill(n + 1)(Inf)
    distance(0) = 0L
    val prevNode = Array.fill(n + 1)(-1)
    val prevFit = new Array[Fit](n + 1)
    val prevEps = new Array[Long](n + 1)

    var k = 0
    while (k < n) {
      // Refresh dead approximations and relax prefix edges (i, k).
      var p = 0
      while (p < nP) {
        if (live(p) == null || live(p).end <= k)
          live(p) = ConvexFit.longestFragment(ys, shift, k, pairs(p)._1, pairs(p)._2, scratch)
        val f = live(p)
        val i = f.start
        if (f.end > k && i < k && distance(i) < Inf) {
          val w = (k - i).toLong * bitsPerPoint(p) + kap(p)
          if (distance(k) > distance(i) + w) {
            distance(k) = distance(i) + w
            prevNode(k) = i; prevFit(k) = f; prevEps(k) = pairs(p)._2
          }
        }
        p += 1
      }
      // Relax suffix edges (k, j).
      if (distance(k) < Inf) {
        p = 0
        while (p < nP) {
          val f = live(p)
          val j = f.end
          if (j > k && f.start <= k) {
            val w = (j - k).toLong * bitsPerPoint(p) + kap(p)
            if (distance(j) > distance(k) + w) {
              distance(j) = distance(k) + w
              prevNode(j) = k; prevFit(j) = f; prevEps(j) = pairs(p)._2
            }
          }
          p += 1
        }
      }
      k += 1
    }
    require(distance(n) < Inf,
      "node n unreachable — no (kind, eps) pair could cover some point; include LinearKind")

    // Read the shortest path backwards into pieces.
    val out = scala.collection.mutable.ArrayBuffer[Piece]()
    var node = n
    while (node != 0) {
      val i = prevNode(node)
      val f = prevFit(node)
      val e = prevEps(node)
      out += Piece(i, node, f.kind, f.m, f.b, f.p3, e, if (lossy) 0 else corrBits(e))
      node = i
    }
    out.reverse.toVector
  }
}
