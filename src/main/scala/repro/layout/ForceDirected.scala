package repro.layout

import java.util.Random
import repro.graph.LocalGraph

/** Single-level force-directed baselines (§7.1 category (i)): FR [25],
  * LinLog [57] and ForceAtlas2 [38]. All O(n²) per iteration with seeded
  * random initialisation and a linear cooling schedule — faithful to the
  * algorithms' published force models at the scale of the 6 small quality
  * graphs.
  */
object ForceDirected {

  /** Undirected neighbour sets (out ∪ in) and degrees. */
  private def undirected(g: LocalGraph): Array[Array[Int]] =
    Array.tabulate(g.n)(v => (g.outNeighbors(v) ++ g.inNeighbors(v)).distinct.filter(_ != v).toArray)

  private def init(n: Int, seed: Long): Array[Array[Double]] = {
    val rnd = new Random(seed)
    Array.fill(n, 2)(rnd.nextDouble() * 2.0 - 1.0)
  }

  /** Fruchterman–Reingold: repulsion k²/d between all pairs, attraction d²/k
    * along edges, displacement capped by a cooling temperature.
    */
  def fr(g: LocalGraph, iters: Int = 300, seed: Long = 0): Array[Array[Double]] = {
    val n   = g.n
    val nb  = undirected(g)
    val x   = init(n, seed)
    val k   = math.sqrt(1.0 / n)
    var it  = 0
    while (it < iters) {
      val temp = 0.1 * (1.0 - it.toDouble / iters) + 1e-4
      val disp = Array.ofDim[Double](n, 2)
      var i = 0
      while (i < n) {
        var j = 0
        while (j < n) {
          if (j != i) {
            val dx = x(i)(0) - x(j)(0); val dy = x(i)(1) - x(j)(1)
            val d2 = dx * dx + dy * dy + 1e-9
            val f  = k * k / d2 // (k²/d)/d per component
            disp(i)(0) += dx * f; disp(i)(1) += dy * f
          }
          j += 1
        }
        nb(i).foreach { u =>
          val dx = x(i)(0) - x(u)(0); val dy = x(i)(1) - x(u)(1)
          val d  = math.sqrt(dx * dx + dy * dy) + 1e-9
          val f  = d / k // (d²/k)/d per component
          disp(i)(0) -= dx * f; disp(i)(1) -= dy * f
        }
        i += 1
      }
      i = 0
      while (i < n) {
        val len = math.sqrt(disp(i)(0) * disp(i)(0) + disp(i)(1) * disp(i)(1)) + 1e-12
        val s   = math.min(len, temp) / len
        x(i)(0) += disp(i)(0) * s; x(i)(1) += disp(i)(1) * s
        i += 1
      }
      it += 1
    }
    x
  }

  /** LinLog energy model: linear attraction along edges, logarithmic
    * repulsion (force magnitude 1/d) between all pairs.
    */
  def linLog(g: LocalGraph, iters: Int = 300, seed: Long = 0): Array[Array[Double]] = {
    val n  = g.n
    val nb = undirected(g)
    val x  = init(n, seed)
    var it = 0
    while (it < iters) {
      val step = 0.05 * (1.0 - it.toDouble / iters) + 1e-4
      val disp = Array.ofDim[Double](n, 2)
      var i = 0
      while (i < n) {
        var j = 0
        while (j < n) {
          if (j != i) {
            val dx = x(i)(0) - x(j)(0); val dy = x(i)(1) - x(j)(1)
            val d2 = dx * dx + dy * dy + 1e-9
            disp(i)(0) += dx / d2; disp(i)(1) += dy / d2 // (1/d)/d per comp
          }
          j += 1
        }
        nb(i).foreach { u =>
          val dx = x(i)(0) - x(u)(0); val dy = x(i)(1) - x(u)(1)
          val d  = math.sqrt(dx * dx + dy * dy) + 1e-9
          disp(i)(0) -= dx / d; disp(i)(1) -= dy / d // unit attraction
        }
        i += 1
      }
      i = 0
      while (i < n) {
        val len = math.sqrt(disp(i)(0) * disp(i)(0) + disp(i)(1) * disp(i)(1)) + 1e-12
        val s   = math.min(len, step) / len
        x(i)(0) += disp(i)(0) * s; x(i)(1) += disp(i)(1) * s
        i += 1
      }
      it += 1
    }
    x
  }

  /** ForceAtlas2: degree-weighted repulsion k_r(d_i+1)(d_j+1)/d, linear
    * attraction, and gravity pulling every node toward the origin.
    */
  def forceAtlas(g: LocalGraph, iters: Int = 300, seed: Long = 0): Array[Array[Double]] = {
    val n   = g.n
    val nb  = undirected(g)
    val deg = Array.tabulate(n)(nb(_).length)
    val x   = init(n, seed)
    val kr  = 0.01
    val grav = 0.05
    var it  = 0
    while (it < iters) {
      val step = 0.05 * (1.0 - it.toDouble / iters) + 1e-4
      val disp = Array.ofDim[Double](n, 2)
      var i = 0
      while (i < n) {
        var j = 0
        while (j < n) {
          if (j != i) {
            val dx = x(i)(0) - x(j)(0); val dy = x(i)(1) - x(j)(1)
            val d2 = dx * dx + dy * dy + 1e-9
            val f  = kr * (deg(i) + 1.0) * (deg(j) + 1.0) / d2
            disp(i)(0) += dx * f; disp(i)(1) += dy * f
          }
          j += 1
        }
        nb(i).foreach { u =>
          disp(i)(0) -= (x(i)(0) - x(u)(0)); disp(i)(1) -= (x(i)(1) - x(u)(1))
        }
        // Gravity.
        disp(i)(0) -= grav * (deg(i) + 1.0) * x(i)(0)
        disp(i)(1) -= grav * (deg(i) + 1.0) * x(i)(1)
        i += 1
      }
      i = 0
      while (i < n) {
        val len = math.sqrt(disp(i)(0) * disp(i)(0) + disp(i)(1) * disp(i)(1)) + 1e-12
        val s   = math.min(len, step) / len
        x(i)(0) += disp(i)(0) * s; x(i)(1) += disp(i)(1) * s
        i += 1
      }
      it += 1
    }
    x
  }
}
