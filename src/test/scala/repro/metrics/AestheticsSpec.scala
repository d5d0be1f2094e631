package repro.metrics

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.graph.{GraphGen, LocalGraph}

class AestheticsSpec extends SparkSpec {

  test("normalize centres the centroid at the origin") {
    val x = Array(Array(1.0, 2.0), Array(3.0, 4.0), Array(5.0, 9.0))
    val n = Aesthetics.normalize(x)
    assert(math.abs(n.map(_(0)).sum) < 1e-12)
    assert(math.abs(n.map(_(1)).sum) < 1e-12)
  }

  test("normalize scales the max |coordinate| to 1") {
    val x = Array(Array(0.0, 0.0), Array(10.0, 0.0), Array(0.0, 4.0))
    val n = Aesthetics.normalize(x)
    val maxAbs = n.flatten.map(math.abs).max
    assert(math.abs(maxAbs - 1.0) < 1e-12)
  }

  test("normalize of identical points does not divide by zero") {
    val n = Aesthetics.normalize(Array(Array(3.0, 3.0), Array(3.0, 3.0)))
    assert(n.flatten.forall(_ == 0.0))
  }

  test("ND of the unit-square corners") {
    // Pairs: 4 sides at d²=4 (after normalize: corners ±1 → d=2) and
    // 2 diagonals at d²=8.
    val x = Array(Array(-1.0, -1.0), Array(1.0, -1.0), Array(1.0, 1.0), Array(-1.0, 1.0))
    val nd = Aesthetics.nd(x)
    assert(math.abs(nd - (4 * 0.25 + 2 * 0.125)) < 1e-12)
  }

  test("overlapping nodes yield infinite ND") {
    val x = Array(Array(0.0, 0.0), Array(0.0, 0.0), Array(1.0, 1.0))
    assert(Aesthetics.nd(x).isInfinite)
  }

  test("ND matches a DuckDB SQL computation over the position table") {
    import spark.implicits._
    val rnd = new java.util.Random(5)
    val pts = (0 until 40).map(i => (i, rnd.nextDouble(), rnd.nextDouble()))
    val df  = pts.toDF("id", "x", "y")
    val sparkNd = df.as("a").join(df.as("b"), col("a.id") < col("b.id"))
      .select(round(sum(
        lit(1.0) / ((col("a.x") - col("b.x")) * (col("a.x") - col("b.x"))
                  + (col("a.y") - col("b.y")) * (col("a.y") - col("b.y")))), 6).as("nd"))
    Oracle.assertEquivalent(
      sparkNd,
      """SELECT round(sum(1.0 / ((a.x::DOUBLE - b.x::DOUBLE)*(a.x::DOUBLE - b.x::DOUBLE)
                              + (a.y::DOUBLE - b.y::DOUBLE)*(a.y::DOUBLE - b.y::DOUBLE))), 6) AS nd
         FROM pts a JOIN pts b ON a.id::INT < b.id::INT""",
      "pts" -> df)
    val local = Aesthetics.nd(pts.map(p => Array(p._2, p._3)).toArray)
    val fromDf = sparkNd.collect()(0).getDouble(0)
    assert(math.abs(local - fromDf) < 1e-4)
  }

  test("ULCV is zero for uniform edge lengths") {
    val g = LocalGraph.undirected(4, Seq((0, 1), (2, 3)))
    val x = Array(Array(0.0, 0.0), Array(1.0, 0.0), Array(5.0, 5.0), Array(5.0, 6.0))
    assert(Aesthetics.ulcv(x, Aesthetics.undirectedEdges(g)).get == 0.0)
  }

  test("ULCV of a 2:1 edge-length split is 1/3") {
    // lengths {1, 2}: mean 1.5, population std 0.5 → ULCV = 1/3.
    val g = LocalGraph.undirected(4, Seq((0, 1), (2, 3)))
    val x = Array(Array(0.0, 0.0), Array(1.0, 0.0), Array(0.0, 5.0), Array(2.0, 5.0))
    val u = Aesthetics.ulcv(x, Aesthetics.undirectedEdges(g)).get
    assert(math.abs(u - (0.5 / 1.5)) < 1e-12)
  }

  test("ULCV is undefined without edges") {
    assert(Aesthetics.ulcv(Array(Array(0.0, 0.0)), Array.empty).isEmpty)
  }

  test("ULCV is undefined when all edges have zero length") {
    val g = LocalGraph.undirected(2, Seq((0, 1)))
    val x = Array(Array(1.0, 1.0), Array(1.0, 1.0))
    assert(Aesthetics.ulcv(x, Aesthetics.undirectedEdges(g)).isEmpty)
  }

  test("undirectedEdges deduplicates the two arc directions") {
    val g = LocalGraph.undirected(3, Seq((0, 1), (1, 2)))
    assert(Aesthetics.undirectedEdges(g).toSet == Set((0, 1), (1, 2)))
  }

  test("AR of a perfectly spread star is zero") {
    // Centre 0 with 4 arms at 90° spacing.
    val g = LocalGraph.undirected(5, Seq((0, 1), (0, 2), (0, 3), (0, 4)))
    val x = Array(Array(0.0, 0.0), Array(1.0, 0.0), Array(0.0, 1.0),
                  Array(-1.0, 0.0), Array(0.0, -1.0))
    assert(math.abs(Aesthetics.ar(x, g)) < 1e-9)
  }

  test("AR grows when arms bunch together") {
    val g = LocalGraph.undirected(5, Seq((0, 1), (0, 2), (0, 3), (0, 4)))
    val spread = Array(Array(0.0, 0.0), Array(1.0, 0.0), Array(0.0, 1.0),
                       Array(-1.0, 0.0), Array(0.0, -1.0))
    val bunched = Array(Array(0.0, 0.0), Array(1.0, 0.0), Array(1.0, 0.1),
                        Array(1.0, -0.1), Array(0.0, -1.0))
    assert(Aesthetics.ar(bunched, g) > Aesthetics.ar(spread, g))
  }

  test("degree-one nodes contribute nothing to AR") {
    val g = LocalGraph.undirected(2, Seq((0, 1)))
    val x = Array(Array(0.0, 0.0), Array(1.0, 0.0))
    assert(Aesthetics.ar(x, g) == 0.0)
  }

  test("metrics flag the known pathologies the paper reports for baselines") {
    // A layout that collapses two nodes (PMDS's degree-one pivot issue)
    // must give ND = ∞, matching the paper's ∞ entries.
    val x = Array(Array(0.0, 0.0), Array(0.0, 0.0), Array(0.5, 0.5), Array(1.0, 0.0))
    assert(Aesthetics.nd(Aesthetics.normalize(x)).isInfinite)
  }

  test("quality cell evaluation on a real small graph is finite for PPRviz") {
    val g = GraphGen.twEgo
    val dppr = repro.ppr.PowerIteration.dpprMatrix(g, 0.2)
    val x = repro.layout.StressMajorization.layout(repro.core.PDist.matrix(dppr, g.n), 3)
    val xn = Aesthetics.normalize(x)
    assert(!Aesthetics.nd(xn).isInfinite)
    assert(Aesthetics.ulcv(xn, Aesthetics.undirectedEdges(g)).isDefined)
  }
}
