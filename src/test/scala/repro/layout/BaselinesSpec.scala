package repro.layout

import repro.SparkSpec
import repro.graph.{GraphGen, LocalGraph}

/** Sanity contracts for the 11 competitor layout methods: well-formed
  * output, determinism where promised, and the qualitative property each
  * algorithm is supposed to deliver.
  */
class BaselinesSpec extends SparkSpec {

  private lazy val g = GraphGen.twEgo

  private def wellFormed(x: Array[Array[Double]], n: Int): Unit = {
    assert(x.length == n)
    x.foreach { p =>
      assert(p.length == 2)
      assert(p.forall(v => !v.isNaN && !v.isInfinite))
    }
  }

  private def meanDist(x: Array[Array[Double]], pairs: Seq[(Int, Int)]): Double = {
    val ds = pairs.map { case (a, b) =>
      math.hypot(x(a)(0) - x(b)(0), x(a)(1) - x(b)(1))
    }
    ds.sum / ds.length
  }

  private def edgeVsNonEdge(x: Array[Array[Double]]): (Double, Double) = {
    val xs = repro.metrics.Aesthetics.normalize(x)
    val edges = repro.metrics.Aesthetics.undirectedEdges(g).toSeq
    val es = edges.toSet
    val non = (for (a <- 0 until g.n; b <- (a + 1) until g.n
                    if !es.contains((a, b))) yield (a, b)).take(500)
    (meanDist(xs, edges), meanDist(xs, non))
  }

  test("FR layout is well-formed and pulls neighbours together") {
    val x = ForceDirected.fr(g, seed = 1)
    wellFormed(x, g.n)
    val (e, ne) = edgeVsNonEdge(x)
    assert(e < ne, s"edge mean $e >= non-edge mean $ne")
  }

  test("LinLog layout is well-formed and pulls neighbours together") {
    val x = ForceDirected.linLog(g, seed = 1)
    wellFormed(x, g.n)
    val (e, ne) = edgeVsNonEdge(x)
    assert(e < ne)
  }

  test("ForceAtlas layout is well-formed and pulls neighbours together") {
    val x = ForceDirected.forceAtlas(g, seed = 1)
    wellFormed(x, g.n)
    val (e, ne) = edgeVsNonEdge(x)
    assert(e < ne)
  }

  test("CMDS layout is well-formed") {
    wellFormed(Cmds.layout(g, seed = 1), g.n)
  }

  test("CMDS on a path graph stretches the chain") {
    val path = LocalGraph.undirected(6, (0 until 5).map(i => (i, i + 1)))
    val x = Cmds.layout(path, seed = 2)
    val endToEnd = math.hypot(x(0)(0) - x(5)(0), x(0)(1) - x(5)(1))
    val step     = math.hypot(x(0)(0) - x(1)(0), x(0)(1) - x(1)(1))
    assert(endToEnd > 3 * step)
  }

  test("PMDS layout is well-formed") {
    wellFormed(Pmds.layout(g, seed = 1), g.n)
  }

  test("PMDS recovers the long axis of a path graph") {
    val path = LocalGraph.undirected(40, (0 until 39).map(i => (i, i + 1)))
    val x = Pmds.layout(path, nPivots = 10, seed = 3)
    val endToEnd = math.hypot(x(0)(0) - x(39)(0), x(0)(1) - x(39)(1))
    val mid      = math.hypot(x(0)(0) - x(20)(0), x(0)(1) - x(20)(1))
    assert(endToEnd > mid)
  }

  test("LapEig layout is well-formed") {
    wellFormed(Spectral.lapEig(g), g.n)
  }

  test("LapEig separates two loosely-bridged cliques") {
    val edges = (for (a <- 0 until 6; b <- (a + 1) until 6) yield (a, b)) ++
                (for (a <- 6 until 12; b <- (a + 1) until 12) yield (a, b)) :+ (0, 6)
    val gg = LocalGraph.undirected(12, edges)
    val x  = Spectral.lapEig(gg)
    val within = meanDist(x, Seq((0, 1), (1, 2), (6, 7), (7, 8)))
    val across = meanDist(x, Seq((1, 7), (2, 8), (3, 9)))
    assert(across > within)
  }

  test("LLE layout is well-formed") {
    wellFormed(Spectral.lle(g), g.n)
  }

  test("GFactor layout is well-formed and deterministic") {
    val a = GFactor.layout(g, seed = 4)
    val b = GFactor.layout(g, seed = 4)
    wellFormed(a, g.n)
    assert(a.flatten.toSeq == b.flatten.toSeq)
  }

  test("GFactor gives adjacent pairs larger inner products than non-adjacent") {
    val x = GFactor.layout(g, seed = 4)
    def dot(a: Int, b: Int) = x(a)(0) * x(b)(0) + x(a)(1) * x(b)(1)
    val edges = repro.metrics.Aesthetics.undirectedEdges(g).toSeq
    val es = edges.toSet
    val non = (for (a <- 0 until g.n; b <- (a + 1) until g.n
                    if !es.contains((a, b))) yield (a, b)).take(200)
    val eDot  = edges.map((dot _).tupled).sum / edges.length
    val neDot = non.map((dot _).tupled).sum / non.length
    assert(eDot > neDot)
  }

  test("SDNE layout is well-formed") {
    wellFormed(Sdne.layout(g, epochs = 30, seed = 5), g.n)
  }

  test("Node2vec layout is well-formed") {
    wellFormed(Node2vecLayout.layout(spark, g, walksPerNode = 5, walkLen = 20, seed = 6), g.n)
  }

  test("SimRank: diagonal 1, symmetric, in [0,1]") {
    val s = SimRankDist.simrank(g)
    (0 until g.n).foreach { a =>
      assert(s(a)(a) == 1.0)
      (0 until g.n).foreach { b =>
        assert(s(a)(b) == s(b)(a))
        assert(s(a)(b) >= 0.0 && s(a)(b) <= 1.0 + 1e-9)
      }
    }
  }

  test("SimRank distance matrix respects the Eq. 1 range") {
    val d = SimRankDist.distances(g)
    for (i <- 0 until g.n; j <- 0 until g.n if i != j) {
      assert(d(i)(j) >= 2.0 && d(i)(j) <= 2 * math.log(g.n) + 1e-12)
    }
  }

  test("SimRank layout is well-formed") {
    wellFormed(SimRankDist.layout(g, seed = 7), g.n)
  }
}
