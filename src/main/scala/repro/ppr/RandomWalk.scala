package repro.ppr

import java.util.Random
import repro.graph.LocalGraph

/** Random-walk-with-restart sampler (Fogaras et al. [24]) — the Monte-Carlo
  * refinement stage of the FORA family and GFRA.
  */
object RandomWalk {

  /** One RWR from `start`: stop with probability α per step, otherwise move
    * to a uniform out-neighbour. Returns the terminal node.
    */
  def walk(g: LocalGraph, start: Int, alpha: Double, rnd: Random): Int = {
    var cur = start
    while (rnd.nextDouble() >= alpha) {
      val d = g.outDeg(cur)
      cur = g.outAdj(g.outOff(cur) + rnd.nextInt(d))
    }
    cur
  }

  /** Cumulative-weight sampler over sparse residues: returns a function that
    * draws a node index with probability residue(v)/rsum. Built once per
    * sampling phase (O(#nonzero) setup, O(log) per draw).
    */
  def residueSampler(residue: Array[Double], rsum: Double): Random => Int = {
    val idx = residue.indices.filter(residue(_) > 0.0).toArray
    val cum = new Array[Double](idx.length)
    var acc = 0.0
    var i = 0
    while (i < idx.length) { acc += residue(idx(i)); cum(i) = acc; i += 1 }
    (rnd: Random) => {
      val x = rnd.nextDouble() * acc
      var lo = 0; var hi = idx.length - 1
      while (lo < hi) {
        val mid = (lo + hi) >>> 1
        if (cum(mid) < x) lo = mid + 1 else hi = mid
      }
      idx(lo)
    }
  }
}
