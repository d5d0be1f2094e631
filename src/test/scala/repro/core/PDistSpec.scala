package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.GraphGen
import repro.ppr.PowerIteration

class PDistSpec extends AnyFunSuite {

  test("PDist lies in [2, 2·ln n] for any DPPR sum") {
    val n = 100
    val rnd = new java.util.Random(1)
    (0 until 200).foreach { _ =>
      val s = math.pow(10, rnd.nextDouble() * 12 - 9) // 1e-9 .. 1e3
      val d = PDist.fromDpprSum(s, n)
      assert(d >= PDist.Lower - 1e-12 && d <= PDist.upper(n) + 1e-12)
    }
  }

  test("zero or negative DPPR maps to the upper bound") {
    assert(PDist.fromDpprSum(0.0, 50) == PDist.upper(50))
    assert(PDist.fromDpprSum(-0.1, 50) == PDist.upper(50))
  }

  test("PDist is non-increasing in the DPPR sum") {
    val n = 1000
    var prev = Double.PositiveInfinity
    Seq(1e-9, 1e-6, 1e-3, 0.1, 0.3, 1.0, 10.0).foreach { s =>
      val d = PDist.fromDpprSum(s, n)
      assert(d <= prev + 1e-12)
      prev = d
    }
  }

  test("untruncated region matches 1 − ln(sum)") {
    val n = 10000 // upper bound 2·ln(1e4) ≈ 18.4
    val s = 0.01  // 1 − ln(0.01) ≈ 5.6: inside (2, 2·ln n)
    assert(math.abs(PDist.fromDpprSum(s, n) - (1 - math.log(s))) < 1e-12)
  }

  test("lower truncation engages at sum >= 1/e") {
    // 1 − ln(s) = 2  ⇔  s = e^{-1}
    val n = 1000
    assert(PDist.fromDpprSum(math.exp(-1) + 1e-6, n) == 2.0)
    assert(PDist.fromDpprSum(math.exp(-1) - 1e-4, n) > 2.0)
  }

  test("matrix is symmetric with zero diagonal") {
    val g = GraphGen.twEgo
    val dppr = PowerIteration.dpprMatrix(g, 0.2)
    val m = PDist.matrix(dppr, g.n)
    (0 until g.n).foreach { i =>
      assert(m(i)(i) == 0.0)
      (0 until g.n).foreach(j => assert(m(i)(j) == m(j)(i)))
    }
  }

  test("Fig. 1 intuition: adjacent pairs have comparable PDist despite PPR gaps") {
    // A hub-and-spoke: π(spoke→hub) is large, π(hub→spoke) small, yet the
    // degree scaling keeps adjacent-pair PDist within a narrow band.
    val g = GraphGen.egoNetwork(20, 2, 3, 0.3, seed = 5)
    val dppr = PowerIteration.dpprMatrix(g, 0.2)
    val m = PDist.matrix(dppr, g.n)
    val adjacentD = g.arcs.filter { case (a, b) => a != b }.map { case (a, b) => m(a)(b) }.toSeq
    assert(adjacentD.max / adjacentD.min < 3.0,
      s"adjacent PDist spread too wide: ${adjacentD.min} .. ${adjacentD.max}")
  }

  test("Thm 3.3 edge-length bound: adjacent PDist <= 1 − ln(2α(1−α))") {
    val alpha = 0.2
    val g = GraphGen.fbEgo
    val dppr = PowerIteration.dpprMatrix(g, alpha)
    val m = PDist.matrix(dppr, g.n)
    val bound = 1 - math.log(2 * alpha * (1 - alpha))
    g.arcs.filter { case (a, b) => a != b }.foreach { case (a, b) =>
      assert(m(a)(b) <= bound + 1e-9)
    }
  }

  test("Thm 3.2 ND bound holds when distances are realized exactly") {
    // ND(X) = Σ 1/Δ² when ||X_i − X_j|| = Δ[i,j]; bound 0.215e·m + 0.0175n².
    val g = GraphGen.twEgo
    val dppr = PowerIteration.dpprMatrix(g, 0.2)
    val m = PDist.matrix(dppr, g.n)
    var nd = 0.0
    for (i <- 0 until g.n; j <- (i + 1) until g.n) nd += 1.0 / (m(i)(j) * m(i)(j))
    val bound = 0.215 * math.E * g.m + 0.0175 * g.n * g.n
    assert(nd <= bound, s"nd=$nd bound=$bound")
  }

  test("disconnected pairs land on the upper bound") {
    val g = repro.graph.LocalGraph.fromArcs(4, Seq((0, 1), (1, 0), (2, 3), (3, 2)))
    val dppr = PowerIteration.dpprMatrix(g, 0.2)
    val m = PDist.matrix(dppr, g.n)
    assert(m(0)(2) == PDist.upper(4))
  }
}
