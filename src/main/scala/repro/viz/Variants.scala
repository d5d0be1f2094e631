package repro.viz

import java.util.Random
import repro.core.{Dppr, Gfra, PDist, SuperQuery, TauPush}
import repro.graph.LocalGraph
import repro.hierarchy.Hierarchy
import repro.layout.StressMajorization
import repro.ppr._

/** The PPRviz variants of §7.4 / Tables 8–10: PPRviz with its PDist engine
  * swapped for PI, FORA, FORA+, ResAcc, Tau-Push, GFRA or GFP(τ_max).
  * Every variant shares the Louvain+ hierarchy; they differ in their index
  * (none / random-walk endpoints / DPR+GBP credits) and query algorithm.
  */
object Variants {

  sealed trait Variant { def name: String }
  case object PiVar        extends Variant { val name = "PI"          }
  case object ForaVar      extends Variant { val name = "FORA"        }
  case object ForaPlusVar  extends Variant { val name = "FORA+"       }
  case object ResAccVar    extends Variant { val name = "ResAcc"      }
  case object TauPushVar   extends Variant { val name = "Tau-Push"    }
  case object GfraVar      extends Variant { val name = "GFRA"        }
  case object GfpTauMaxVar extends Variant { val name = "GFP(tmax)"   }

  val all: Seq[Variant] =
    Seq(PiVar, ForaVar, ForaPlusVar, ResAccVar, TauPushVar, GfraVar, GfpTauMaxVar)

  /** Walk-index quotas (mean endpoints per node). FORA/GFRA share the larger
    * index, FORA+ a tighter one — mirroring the Table 10 ratios; see
    * DESIGN.md §3.
    */
  val ForaQuota     = 8
  val ForaPlusQuota = 4

  final case class VariantIndex(
      variant: Variant,
      hier: Hierarchy,
      bytes: Long,
      buildSeconds: Double, // index build time excluding the shared hierarchy
      leafDpr: Option[Array[Double]],
      walkIndex: Option[WalkIndex],
      gbp: Option[Map[(Int, Int), Array[Double]]],
  )

  /** Build a variant's index on top of a shared hierarchy. */
  def buildIndex(variant: Variant, g: LocalGraph, k: Int, hier: Hierarchy,
                 alpha: Double = PPRviz.DefaultAlpha,
                 eps: Double = PPRviz.DefaultEps,
                 gbpOpBudget: Long = 30_000_000L,
                 seed: Long = 99): VariantIndex = {
    val base = hier.sizeBytes
    variant match {
      case PiVar | ResAccVar =>
        VariantIndex(variant, hier, base, 0.0, None, None, None)
      case ForaVar | GfraVar =>
        val (wi, t) = PPRviz.timeSec(WalkIndex.build(g, alpha, ForaQuota, seed))
        VariantIndex(variant, hier, base + wi.sizeBytes, t, None, Some(wi), None)
      case ForaPlusVar =>
        val (wi, t) = PPRviz.timeSec(WalkIndex.build(g, alpha, ForaPlusQuota, seed))
        VariantIndex(variant, hier, base + wi.sizeBytes, t, None, Some(wi), None)
      case TauPushVar =>
        val (dpr, t1) = PPRviz.timeSec(Dpr.vector(g, alpha))
        val (gbp, t2) = PPRviz.timeSec(
          PPRviz.buildGbpAggregates(g, hier, dpr, k, alpha, eps, gbpOpBudget))
        val bytes = base + 8L * g.n +
          gbp.valuesIterator.map(a => 8L * a.length + 32L).sum
        VariantIndex(variant, hier, bytes, t1 + t2, Some(dpr), None, Some(gbp))
      case GfpTauMaxVar =>
        val (dpr, t1) = PPRviz.timeSec(Dpr.vector(g, alpha))
        VariantIndex(variant, hier, base + 8L * g.n, t1, Some(dpr), None, None)
    }
  }

  /** Approximate level-ℓ DPPR matrix for a query under a variant. The FORA
    * family and PI run per leaf node of the selected supernode, as the paper
    * describes (§3.3, App. A.2) — this is exactly why they exceed the
    * response deadline on large graphs (Table 8).
    */
  def dpprMatrix(vi: VariantIndex, g: LocalGraph, q: SuperQuery, level: Int,
                 ids: Array[Int], k: Int, alpha: Double, eps: Double,
                 deadline: Deadline, seed: Long): Array[Array[Double]] = {
    val del = PPRviz.delta(k)
    val pf  = 1.0 / g.n
    vi.variant match {
      case PiVar =>
        Dppr.perLeafMatrix(g, q, alpha, 1e-9, deadline)
      case ForaVar | ForaPlusVar | ResAccVar =>
        val rnd = new Random(seed)
        val out = Array.ofDim[Double](q.k, q.k)
        var i = 0
        while (i < q.k) {
          val leaves = q.children(i)
          leaves.foreach { s =>
            deadline.check()
            val est = vi.variant match {
              case ForaVar     => Fora.dppr(g, s, alpha, eps, del, pf, rnd, deadline, vi.walkIndex.orNull)
              case ForaPlusVar => ForaPlus.dppr(g, s, alpha, eps, del, pf, rnd, vi.walkIndex.get, deadline)
              case _           => ResAcc.dppr(g, s, alpha, eps, del, pf, rnd, deadline)
            }
            // Eq. 2 aggregation of the per-leaf single-source estimates.
            var v = 0
            while (v < g.n) {
              val cj = q.members(v)
              if (cj >= 0 && est(v) != 0.0)
                out(i)(cj) += est(v) / (leaves.length.toDouble * q.size(cj))
              v += 1
            }
          }
          i += 1
        }
        out
      case TauPushVar =>
        val lookup: Int => Option[Array[Double]] =
          j => vi.gbp.get.get((level - 1, ids(j)))
        TauPush.run(g, q, vi.leafDpr.get, alpha, eps, del, TauPush.Standard, deadline, lookup).dppr
      case GfpTauMaxVar =>
        TauPush.run(g, q, vi.leafDpr.get, alpha, eps, del, TauPush.GfpTauMax, deadline).dppr
      case GfraVar =>
        Gfra.run(g, q, alpha, eps, del, pf, seed, deadline, vi.walkIndex.orNull)
    }
  }

  /** One visualization under a variant: DPPR → PDist → stress majorization.
    * Returns None when the deadline is exceeded (a "-" entry in Table 8).
    */
  def visualize(vi: VariantIndex, g: LocalGraph, level: Int, id: Int, k: Int,
                deadline: Deadline, seed: Long = 7,
                alpha: Double = PPRviz.DefaultAlpha,
                eps: Double = PPRviz.DefaultEps): Option[Array[Array[Double]]] =
    try {
      val (q, ids) = PPRviz.queryWithIds(vi.hier, level, id)
      val dppr     = dpprMatrix(vi, g, q, level, ids, k, alpha, eps, deadline, seed)
      Some(StressMajorization.layout(PDist.matrix(dppr, g.n), seed))
    } catch {
      case _: Deadline.Exceeded => None
    }

  /** Average response time over zoom paths; None if any query hits the
    * deadline (the paper terminates such methods).
    */
  def responseTime(vi: VariantIndex, g: LocalGraph, k: Int, paths: Int,
                   deadlineSec: Double, seed: Long): Option[Double] = {
    val rnd = new Random(seed)
    var total = 0.0
    var count = 0
    var p = 0
    while (p < paths) {
      val path = vi.hier.randomZoomPath(rnd)
      path.foreach { case (level, id) =>
        val t0 = System.nanoTime()
        visualize(vi, g, level, id, k, Deadline.in(deadlineSec)) match {
          case Some(_) =>
            total += (System.nanoTime() - t0) / 1e9
            count += 1
          case None => return None
        }
      }
      p += 1
    }
    Some(total / count)
  }
}
