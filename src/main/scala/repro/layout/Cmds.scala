package repro.layout

import repro.graph.LocalGraph

/** Shortest-path distances (BFS, undirected view) shared by the stress-based
  * baselines. Unreachable pairs get `2 × (diameter + 1)` so multi-component
  * graphs still embed (components repel to a finite distance).
  */
object ShortestPaths {

  def undirectedAdj(g: LocalGraph): Array[Array[Int]] =
    Array.tabulate(g.n)(v => (g.outNeighbors(v) ++ g.inNeighbors(v)).distinct.filter(_ != v).toArray)

  def bfs(adj: Array[Array[Int]], src: Int): Array[Int] = {
    val dist = Array.fill(adj.length)(-1)
    dist(src) = 0
    val q = new java.util.ArrayDeque[Integer]()
    q.add(src)
    while (!q.isEmpty) {
      val v = q.poll().intValue()
      adj(v).foreach { u =>
        if (dist(u) < 0) { dist(u) = dist(v) + 1; q.add(u) }
      }
    }
    dist
  }

  /** All-pair shortest distances as doubles; unreachable → 2·(maxFinite+1). */
  def allPairs(g: LocalGraph): Array[Array[Double]] = {
    val adj = undirectedAdj(g)
    val raw = Array.tabulate(g.n)(bfs(adj, _))
    val maxFinite = raw.iterator.flatMap(_.iterator).max
    val far = 2.0 * (maxFinite + 1)
    raw.map(_.map(d => if (d < 0) far else d.toDouble))
  }
}

/** CMDS [28] as used in the paper: the classic stress method — all-pair
  * shortest distances embedded by stress majorization. The paper attributes
  * its ∞ ND scores to those distances "taking only a few discrete values".
  */
object Cmds {
  def layout(g: LocalGraph, seed: Long = 0): Array[Array[Double]] =
    StressMajorization.layout(ShortestPaths.allPairs(g), seed)
}

/** PMDS [15] — pivot MDS (Brandes–Pich): BFS distances to p pivots chosen by
  * max-min sweep, double centering of the squared-distance matrix, positions
  * from the top-2 eigenvectors of CᵀC.
  */
object Pmds {

  def layout(g: LocalGraph, nPivots: Int = 50, seed: Long = 0): Array[Array[Double]] = {
    import breeze.linalg.{eigSym, DenseMatrix}
    val n   = g.n
    val p   = math.min(nPivots, n)
    val adj = ShortestPaths.undirectedAdj(g)

    // Max-min pivot selection starting from node 0.
    val pivots  = new Array[Int](p)
    val minDist = Array.fill(n)(Int.MaxValue)
    val dists   = new Array[Array[Int]](p)
    var i = 0
    var next = 0
    while (i < p) {
      pivots(i) = next
      val d = ShortestPaths.bfs(adj, next)
      dists(i) = d
      var best = -1; var bestD = -1
      var v = 0
      while (v < n) {
        val dv = if (d(v) < 0) n else d(v) // unreachable counts as far
        if (dv < minDist(v)) minDist(v) = dv
        if (minDist(v) > bestD) { bestD = minDist(v); best = v }
        v += 1
      }
      next = best
      i += 1
    }

    val maxFinite = dists.iterator.flatMap(_.iterator).max
    val far = 2.0 * (maxFinite + 1)
    // Squared distances, double centering (Brandes–Pich eq. for C).
    val sq = Array.tabulate(n, p) { (v, j) =>
      val d  = dists(j)(v)
      val dd = if (d < 0) far else d.toDouble
      dd * dd
    }
    val rowMean = Array.tabulate(n)(v => sq(v).sum / p)
    val colMean = Array.tabulate(p)(j => (0 until n).map(sq(_)(j)).sum / n)
    val total   = rowMean.sum / n
    val cc = DenseMatrix.tabulate(n, p) { (v, j) =>
      -0.5 * (sq(v)(j) - rowMean(v) - colMean(j) + total)
    }
    val es  = eigSym(cc.t * cc)
    val ord = es.eigenvalues.toArray.zipWithIndex.sortBy(-_._1).map(_._2)
    val v1  = es.eigenvectors(::, ord(0))
    val v2  = es.eigenvectors(::, if (p > 1) ord(1) else ord(0))
    val x1  = cc * v1
    val x2  = cc * v2
    Array.tabulate(n)(v => Array(x1(v), x2(v)))
  }
}
