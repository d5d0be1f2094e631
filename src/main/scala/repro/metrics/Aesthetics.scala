package repro.metrics

import repro.graph.LocalGraph

/** Aesthetic criteria of §2.3 and Appendix A.5 — ND (Def. 2.1), ULCV
  * (Def. 2.2) and angular resolution (AR), computed on layouts normalized to
  * a common scale the way the paper does ("we follow NetworkX and normalize
  * each layout to the same scale", §7.1): centre at the centroid and scale
  * the maximum absolute coordinate to 1.
  */
object Aesthetics {

  /** NetworkX-style rescale: centroid at the origin, max |coordinate| = 1. */
  def normalize(x: Array[Array[Double]]): Array[Array[Double]] = {
    val n = x.length
    if (n == 0) return x
    val cx = x.map(_(0)).sum / n
    val cy = x.map(_(1)).sum / n
    val centered = x.map(p => Array(p(0) - cx, p(1) - cy))
    val maxAbs = centered.iterator.flatMap(_.iterator).map(math.abs).foldLeft(0.0)(math.max)
    if (maxAbs < 1e-12) centered
    else centered.map(p => Array(p(0) / maxAbs, p(1) / maxAbs))
  }

  /** ND(X) = Σ_{i<j} 1/||X[i]−X[j]||² — infinite when nodes overlap. */
  def nd(x: Array[Array[Double]]): Double = {
    val n = x.length
    var s = 0.0
    var i = 0
    while (i < n) {
      var j = i + 1
      while (j < n) {
        val dx = x(i)(0) - x(j)(0)
        val dy = x(i)(1) - x(j)(1)
        val d2 = dx * dx + dy * dy
        if (d2 < 1e-18) return Double.PositiveInfinity
        s += 1.0 / d2
        j += 1
      }
      i += 1
    }
    s
  }

  /** Undirected edge list (a < b) of a graph — the edges whose drawn lengths
    * ULCV and AR measure.
    */
  def undirectedEdges(g: LocalGraph): Array[(Int, Int)] =
    g.arcs
      .filter { case (s, d) => s != d }
      .map { case (s, d) => (math.min(s, d), math.max(s, d)) }
      .toArray
      .distinct

  /** ULCV(X) = σ(edge lengths) / μ(edge lengths); None when undefined (no
    * edges or zero mean — the paper's "-" entries).
    */
  def ulcv(x: Array[Array[Double]], edges: Array[(Int, Int)]): Option[Double] = {
    if (edges.isEmpty) return None
    val lens = edges.map { case (a, b) =>
      val dx = x(a)(0) - x(b)(0)
      val dy = x(a)(1) - x(b)(1)
      math.sqrt(dx * dx + dy * dy)
    }
    val mean = lens.sum / lens.length
    if (mean < 1e-12 || mean.isNaN) return None
    val variance = lens.map(l => (l - mean) * (l - mean)).sum / lens.length
    Some(math.sqrt(variance) / mean)
  }

  /** Angular resolution (deviation form, Taylor–Rodgers [72]): per node, sort
    * the directions of incident edges and accumulate |2π/d(v) − gap| over
    * consecutive gaps; lower = more evenly spread edges. Nodes with < 2
    * incident edges contribute 0.
    */
  def ar(x: Array[Array[Double]], g: LocalGraph): Double = {
    val adj = Array.fill(g.n)(scala.collection.mutable.ArrayBuffer.empty[Int])
    undirectedEdges(g).foreach { case (a, b) => adj(a) += b; adj(b) += a }
    var total = 0.0
    var v = 0
    while (v < g.n) {
      val nb = adj(v)
      if (nb.length >= 2) {
        val angles = nb.map { u =>
          math.atan2(x(u)(1) - x(v)(1), x(u)(0) - x(v)(0))
        }.sorted
        val ideal = 2.0 * math.Pi / nb.length
        var i = 0
        while (i < angles.length) {
          val next = if (i == angles.length - 1) angles(0) + 2.0 * math.Pi else angles(i + 1)
          total += math.abs(ideal - (next - angles(i)))
          i += 1
        }
      }
      v += 1
    }
    total
  }
}
