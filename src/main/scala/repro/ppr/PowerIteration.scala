package repro.ppr

import repro.graph.LocalGraph

/** Exact (near-exact) PPR via power iteration, the paper's `PI` baseline.
  *
  * The paper runs PI "until the absolute error of PPR is less than 1e-9".
  * Since the restart series contracts by (1-α) per term, running
  * `t = ceil(ln(tol) / ln(1-α))` iterations bounds the truncation error of
  * every entry by `tol`. These routines are the correctness oracle for every
  * approximate algorithm in the repo.
  */
object PowerIteration {

  /** Iterations needed for absolute error < tol. */
  def itersFor(alpha: Double, tol: Double = 1e-9): Int =
    math.ceil(math.log(tol) / math.log(1.0 - alpha)).toInt + 1

  /** PPR vector for a source distribution `s` (must sum to 1):
    * p ← α·s + (1-α)·Pᵀp.
    */
  def pprFromDistribution(g: LocalGraph, s: Array[Double], alpha: Double,
                          tol: Double = 1e-9,
                          deadline: Deadline = Deadline.none): Array[Double] = {
    val n = g.n
    var p = s.clone()
    val iters = itersFor(alpha, tol)
    var it = 0
    while (it < iters) {
      deadline.check()
      val next = new Array[Double](n)
      var v = 0
      while (v < n) {
        val pv = p(v)
        if (pv != 0.0) {
          val share = (1.0 - alpha) * pv / g.outDeg(v)
          g.foreachOut(v)(u => next(u) += share)
        }
        v += 1
      }
      var i = 0
      while (i < n) { next(i) += alpha * s(i); i += 1 }
      // The recurrence yields p_t = α Σ_{i<=t} (1-α)^i (Pᵀ)^i s exactly, but
      // the loop above computes (1-α)Pᵀp_t + αs, i.e. the same series.
      p = next
      it += 1
    }
    p
  }

  /** Single-source PPR vector π(src, ·). */
  def ppr(g: LocalGraph, src: Int, alpha: Double, tol: Double = 1e-9): Array[Double] = {
    val s = new Array[Double](g.n)
    s(src) = 1.0
    pprFromDistribution(g, s, alpha, tol)
  }

  /** Single-source DPPR vector π_d(src, ·) = π(src, ·) · d(src). */
  def dppr(g: LocalGraph, src: Int, alpha: Double, tol: Double = 1e-9): Array[Double] = {
    val p = ppr(g, src, alpha, tol)
    val d = g.outDeg(src).toDouble
    p.map(_ * d)
  }

  /** Full n×n PPR matrix — tests/small graphs only. */
  def pprMatrix(g: LocalGraph, alpha: Double, tol: Double = 1e-9): Array[Array[Double]] =
    Array.tabulate(g.n)(src => ppr(g, src, alpha, tol))

  /** Full n×n DPPR matrix — tests/small graphs only. */
  def dpprMatrix(g: LocalGraph, alpha: Double, tol: Double = 1e-9): Array[Array[Double]] =
    Array.tabulate(g.n)(src => dppr(g, src, alpha, tol))
}

/** Wall-clock deadline used to reproduce the paper's response-time cutoffs
  * ("we terminate a method if its response time exceeds 1000 seconds" —
  * scaled to our graphs, see DESIGN.md §3). Checked inside all inner loops.
  */
final class Deadline(val nanos: Long) extends AnyVal {
  @inline def check(): Unit =
    if (nanos != Long.MaxValue && System.nanoTime() > nanos) throw new Deadline.Exceeded
}

object Deadline {
  final class Exceeded extends RuntimeException("deadline exceeded") {
    override def fillInStackTrace(): Throwable = this
  }
  val none: Deadline = new Deadline(Long.MaxValue)
  def in(seconds: Double): Deadline =
    new Deadline(System.nanoTime() + (seconds * 1e9).toLong)
}
