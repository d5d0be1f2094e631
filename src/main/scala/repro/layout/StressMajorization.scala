package repro.layout

import java.util.Random

/** Position-matrix embedding by stress majorization (Eq. 7, Appendix A.1).
  *
  * Minimizes `L(X|Δ) = Σ_{i<j} (1 − ||X[i]−X[j]|| / Δ[i,j])²`, i.e. weighted
  * stress with w_ij = 1/Δ[i,j]². We iterate the SMACOF majorization update
  * (the per-node closed form of Eq. 10's normal equations, which avoids the
  * O(k³) pseudo-inverse while converging to the same stationary points):
  *
  *   X[i] ← Σ_{j≠i} w_ij · (X[j] + Δ[i,j]·(X[i]−X[j])/||X[i]−X[j]||) / Σ_{j≠i} w_ij
  *
  * Each sweep monotonically decreases the majorizing bound of Eq. 9.
  */
object StressMajorization {

  /** Lay out a symmetric distance matrix; entries `d(i)(j) <= 0` (diagonal)
    * are skipped.
    */
  def layout(d: Array[Array[Double]], seed: Long = 0, maxIter: Int = 300,
             tol: Double = 1e-6): Array[Array[Double]] = {
    val n   = d.length
    val rnd = new Random(seed)
    val x   = Array.fill(n, 2)(rnd.nextDouble() * 10.0 - 5.0)
    if (n <= 1) return x

    var prev = stress(x, d)
    var it   = 0
    var done = false
    while (it < maxIter && !done) {
      var i = 0
      while (i < n) {
        var sx = 0.0; var sy = 0.0; var sw = 0.0
        var j = 0
        while (j < n) {
          if (j != i && d(i)(j) > 0.0) {
            val w   = 1.0 / (d(i)(j) * d(i)(j))
            var dx  = x(i)(0) - x(j)(0)
            var dy  = x(i)(1) - x(j)(1)
            var len = math.sqrt(dx * dx + dy * dy)
            if (len < 1e-12) { // coincident: nudge in a random direction
              dx = rnd.nextDouble() - 0.5; dy = rnd.nextDouble() - 0.5
              len = math.sqrt(dx * dx + dy * dy)
            }
            val s = d(i)(j) / len
            sx += w * (x(j)(0) + dx * s)
            sy += w * (x(j)(1) + dy * s)
            sw += w
          }
          j += 1
        }
        if (sw > 0.0) { x(i)(0) = sx / sw; x(i)(1) = sy / sw }
        i += 1
      }
      val cur = stress(x, d)
      if (prev > 0 && (prev - cur) / prev < tol) done = true
      prev = cur
      it += 1
    }
    x
  }

  /** The Eq. 7 loss. */
  def stress(x: Array[Array[Double]], d: Array[Array[Double]]): Double = {
    val n = d.length
    var s = 0.0
    var i = 0
    while (i < n) {
      var j = i + 1
      while (j < n) {
        if (d(i)(j) > 0.0) {
          val dx  = x(i)(0) - x(j)(0)
          val dy  = x(i)(1) - x(j)(1)
          val len = math.sqrt(dx * dx + dy * dy)
          val t   = 1.0 - len / d(i)(j)
          s += t * t
        }
        j += 1
      }
      i += 1
    }
    s
  }
}
