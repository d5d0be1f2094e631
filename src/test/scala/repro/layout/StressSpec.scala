package repro.layout

import org.scalatest.funsuite.AnyFunSuite

class StressSpec extends AnyFunSuite {

  private def pairDist(x: Array[Array[Double]], i: Int, j: Int): Double = {
    val dx = x(i)(0) - x(j)(0); val dy = x(i)(1) - x(j)(1)
    math.sqrt(dx * dx + dy * dy)
  }

  test("an equilateral triangle embeds with (near) zero stress") {
    val d = Array(
      Array(0.0, 1.0, 1.0),
      Array(1.0, 0.0, 1.0),
      Array(1.0, 1.0, 0.0))
    val x = StressMajorization.layout(d, seed = 1)
    assert(StressMajorization.stress(x, d) < 1e-6)
    for (i <- 0 until 3; j <- (i + 1) until 3)
      assert(math.abs(pairDist(x, i, j) - 1.0) < 1e-3)
  }

  test("a unit square (with diagonals √2) embeds with near zero stress") {
    val r2 = math.sqrt(2.0)
    val d = Array(
      Array(0.0, 1.0, r2, 1.0),
      Array(1.0, 0.0, 1.0, r2),
      Array(r2, 1.0, 0.0, 1.0),
      Array(1.0, r2, 1.0, 0.0))
    val x = StressMajorization.layout(d, seed = 2)
    assert(StressMajorization.stress(x, d) < 1e-4)
  }

  test("stress decreases monotonically versus the random start") {
    val rnd = new java.util.Random(3)
    val n = 12
    val d = Array.tabulate(n, n) { (i, j) =>
      if (i == j) 0.0 else 1.0 + math.abs(i - j) * 0.3 + rnd.nextDouble() * 0.1
    }
    // symmetrize
    for (i <- 0 until n; j <- 0 until i) d(i)(j) = d(j)(i)
    val x0 = {
      val r = new java.util.Random(4)
      Array.fill(n, 2)(r.nextDouble() * 10 - 5)
    }
    val before = StressMajorization.stress(x0, d)
    val x = StressMajorization.layout(d, seed = 4)
    assert(StressMajorization.stress(x, d) < before)
  }

  test("coincident-start layouts separate (no NaNs)") {
    val d = Array(
      Array(0.0, 2.0),
      Array(2.0, 0.0))
    val x = StressMajorization.layout(d, seed = 5)
    assert(x.flatten.forall(v => !v.isNaN && !v.isInfinite))
    assert(math.abs(pairDist(x, 0, 1) - 2.0) < 1e-6)
  }

  test("single-node and empty inputs do not crash") {
    assert(StressMajorization.layout(Array(Array(0.0)), 1).length == 1)
    assert(StressMajorization.layout(Array.empty[Array[Double]], 1).isEmpty)
  }

  test("layout is deterministic in the seed") {
    val d = Array.tabulate(6, 6)((i, j) => if (i == j) 0.0 else (math.abs(i - j)).toDouble)
    val a = StressMajorization.layout(d, seed = 7)
    val b = StressMajorization.layout(d, seed = 7)
    assert(a.flatten.toSeq == b.flatten.toSeq)
  }

  test("a path metric embeds monotonically along the chain") {
    val n = 5
    val d = Array.tabulate(n, n)((i, j) => math.abs(i - j).toDouble)
    val x = StressMajorization.layout(d, seed = 8)
    // End-to-end distance should be close to n-1 = 4.
    assert(math.abs(pairDist(x, 0, n - 1) - 4.0) < 0.2)
  }
}
