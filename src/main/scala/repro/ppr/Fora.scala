package repro.ppr

import java.util.Random
import repro.graph.LocalGraph

/** FORA-family baselines (Tables 8–10): two-phase single-source PPR
  * approximation — Forward-Push with early termination, then random-walk
  * sampling of the Eq. (3) error term.
  *
  * Parameterisation follows §7.1 and Appendix A.2: initial residue
  * `r(s,s) = d(s)`, walk count `W = (2+2ε/3)·ln(1/p_f)/(ε²·δ)`,
  * push/walk balance `r_max = sqrt(d(s)/(m·W))`, `ω = r_sum·W`.
  */
object Fora {

  def walkCountW(eps: Double, delta: Double, pf: Double): Double =
    (2.0 + 2.0 * eps / 3.0) * math.log(1.0 / pf) / (eps * eps * delta)

  /** Single-source (ε,δ)-approximate DPPR by vanilla FORA (fresh walks). */
  def dppr(g: LocalGraph, src: Int, alpha: Double, eps: Double, delta: Double,
           pf: Double, rnd: Random, deadline: Deadline = Deadline.none,
           walkIndex: WalkIndex = null): Array[Double] = {
    val w    = walkCountW(eps, delta, pf)
    val d    = math.max(1, g.outDeg(src))
    val rmax = math.sqrt(d / (g.m.toDouble * w))
    val fp   = ForwardPush.dppr(g, src, alpha, rmax, deadline)
    val est  = fp.est
    if (fp.rsum > 0.0) {
      val omega   = math.max(1L, math.ceil(fp.rsum * w).toLong)
      val sampler = RandomWalk.residueSampler(fp.residue, fp.rsum)
      val add     = fp.rsum / omega
      var i = 0L
      while (i < omega) {
        if ((i & 0xff) == 0) deadline.check()
        val start = sampler(rnd)
        val end =
          if (walkIndex != null) walkIndex.endpoint(start, rnd)
          else RandomWalk.walk(g, start, alpha, rnd)
        est(end) += add
        i += 1
      }
    }
    est
  }
}

/** Precomputed random-walk endpoint index — what FORA / FORA+ / GFRA store
  * between queries (the 51 / 30 MiB rows of Table 10, scaled to our graphs).
  * Stores `quota(v)` RWR endpoints per node; queries draw uniformly from the
  * stored endpoints instead of simulating.
  */
final class WalkIndex(val endpoints: Array[Array[Int]]) extends Serializable {
  def endpoint(v: Int, rnd: Random): Int = {
    val e = endpoints(v)
    e(rnd.nextInt(e.length))
  }
  /** Serialized size in bytes: 4 bytes per stored endpoint plus row headers. */
  def sizeBytes: Long = endpoints.map(e => 4L * e.length + 16L).sum
}

object WalkIndex {
  /** Build with `perNode` endpoints for every node (degree-weighted quota:
    * hubs receive proportionally more, mirroring FORA's r_sum ∝ degree).
    */
  def build(g: LocalGraph, alpha: Double, perNode: Int, seed: Long): WalkIndex = {
    val rnd = new Random(seed)
    val avgDeg = g.m.toDouble / g.n
    val eps = Array.tabulate(g.n) { v =>
      val quota = math.max(1, math.round(perNode * g.outDeg(v) / avgDeg).toInt)
      Array.fill(quota)(RandomWalk.walk(g, v, alpha, rnd))
    }
    new WalkIndex(eps)
  }
}

/** FORA+ — FORA answering the walk phase from the precomputed [[WalkIndex]]
  * (faster query, index smaller than FORA's in the paper's Table 10 due to
  * its tighter walk bounds; we mirror the ratio with a smaller quota).
  */
object ForaPlus {
  def dppr(g: LocalGraph, src: Int, alpha: Double, eps: Double, delta: Double,
           pf: Double, rnd: Random, index: WalkIndex,
           deadline: Deadline = Deadline.none): Array[Double] =
    Fora.dppr(g, src, alpha, eps, delta, pf, rnd, deadline, index)
}

/** ResAcc (Lin et al. [47]) — index-free residue-accumulation variant: keeps
  * FORA's two-phase structure but accumulates residues across push rounds
  * before sampling, so it needs no stored index (the 5 MiB "no index" rows of
  * Table 10). Behavioural stand-in, see DESIGN.md §3.
  */
object ResAcc {
  def dppr(g: LocalGraph, src: Int, alpha: Double, eps: Double, delta: Double,
           pf: Double, rnd: Random, deadline: Deadline = Deadline.none): Array[Double] = {
    val w    = Fora.walkCountW(eps, delta, pf)
    val d    = math.max(1, g.outDeg(src))
    // Residue accumulation lets ResAcc push a little deeper for the same
    // budget; modelled as a 2x tighter threshold before the walk phase.
    val rmax = 0.5 * math.sqrt(d / (g.m.toDouble * w))
    val fp   = ForwardPush.dppr(g, src, alpha, rmax, deadline)
    val est  = fp.est
    if (fp.rsum > 0.0) {
      val omega   = math.max(1L, math.ceil(fp.rsum * w).toLong)
      val sampler = RandomWalk.residueSampler(fp.residue, fp.rsum)
      val add     = fp.rsum / omega
      var i = 0L
      while (i < omega) {
        if ((i & 0xff) == 0) deadline.check()
        est(RandomWalk.walk(g, sampler(rnd), alpha, rnd)) += add
        i += 1
      }
    }
    est
  }
}
