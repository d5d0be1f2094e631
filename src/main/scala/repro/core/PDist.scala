package repro.core

/** PDist (Definition 3.1 / Eq. 1):
  *
  *   Δ[i,j] = min( max( 1 − ln(π_d(v_i,v_j) + π_d(v_j,v_i)), 2 ), 2·ln n )
  *
  * The degree scaling removes PPR's adjacent-pair variance, the symmetric sum
  * removes direction, the log-inverse turns proximity into distance, and the
  * [2, 2·ln n] truncation precludes node overlap (lower bound) and blank
  * space (upper bound). Logs are natural (the paper's bounds use Euler's e).
  */
object PDist {

  /** Lower truncation bound: minimum on-screen distance of any node pair. */
  val Lower = 2.0

  /** Upper truncation bound for a graph with n nodes. */
  def upper(n: Int): Double = 2.0 * math.log(n)

  /** Δ from the symmetric DPPR sum `π_d(i,j) + π_d(j,i)`; a zero (or
    * negative, from Monte-Carlo noise) sum maps to the upper bound.
    */
  def fromDpprSum(sum: Double, n: Int): Double = {
    val raw = if (sum <= 0.0) Double.PositiveInfinity else 1.0 - math.log(sum)
    math.min(math.max(raw, Lower), upper(n))
  }

  /** Symmetric k×k PDist matrix from a (possibly asymmetric) k×k DPPR
    * matrix; the diagonal is 0 by convention (a node has no distance to
    * itself — stress majorization skips i = j pairs).
    */
  def matrix(dppr: Array[Array[Double]], n: Int): Array[Array[Double]] = {
    val k = dppr.length
    val out = Array.ofDim[Double](k, k)
    var i = 0
    while (i < k) {
      var j = i + 1
      while (j < k) {
        val v = fromDpprSum(dppr(i)(j) + dppr(j)(i), n)
        out(i)(j) = v
        out(j)(i) = v
        j += 1
      }
      i += 1
    }
    out
  }
}
