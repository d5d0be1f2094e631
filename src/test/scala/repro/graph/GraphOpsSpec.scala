package repro.graph

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}

class GraphOpsSpec extends SparkSpec {

  private lazy val g = GraphGen.twEgo
  private lazy val edges = g.toDF(spark).cache()

  test("outDegrees matches DuckDB") {
    Oracle.assertEquivalent(
      GraphOps.outDegrees(edges).select(col("node"), col("outdeg").cast("long").as("outdeg")),
      "SELECT src AS node, count(*)::BIGINT AS outdeg FROM edges GROUP BY src",
      "edges" -> edges)
  }

  test("inDegrees matches DuckDB") {
    Oracle.assertEquivalent(
      GraphOps.inDegrees(edges).select(col("node"), col("indeg").cast("long").as("indeg")),
      "SELECT dst AS node, count(*)::BIGINT AS indeg FROM edges GROUP BY dst",
      "edges" -> edges)
  }

  test("outDegrees agrees with LocalGraph.outDeg") {
    val m = GraphOps.outDegrees(edges).collect()
      .map(r => r.getAs[Any]("node").toString.toInt -> r.getAs[Long]("outdeg").toInt).toMap
    (0 until g.n).foreach(v => assert(m.getOrElse(v, 0) == g.outDeg(v)))
  }

  test("superEdges matches DuckDB aggregation") {
    import spark.implicits._
    val membership = (0 until g.n).map(v => (v, v % 4)).toDF("node", "comm")
    Oracle.assertEquivalent(
      GraphOps.superEdges(edges, membership)
        .select(col("csrc"), col("cdst"), col("weight").cast("long").as("weight")),
      """SELECT ms.comm AS csrc, md.comm AS cdst, count(*)::BIGINT AS weight
         FROM edges e JOIN membership ms ON e.src = ms.node
                      JOIN membership md ON e.dst = md.node
         GROUP BY ms.comm, md.comm""",
      "edges" -> edges, "membership" -> membership)
  }

  test("superEdges weight total equals m") {
    import spark.implicits._
    val membership = (0 until g.n).map(v => (v, v % 3)).toDF("node", "comm")
    val total = GraphOps.superEdges(edges, membership).agg(sum("weight")).collect()(0).getLong(0)
    assert(total == g.m)
  }

  test("levelDppr matches DuckDB Eq. 2 aggregation") {
    import spark.implicits._
    val rnd = new java.util.Random(3)
    val pairs = (for (s <- 0 until g.n; d <- 0 until g.n if rnd.nextDouble() < 0.2)
      yield (s, d, rnd.nextDouble())).toDF("src", "dst", "dppr")
    val membership = (0 until g.n).map(v => (v, v % 5)).toDF("node", "comm")
    Oracle.assertEquivalent(
      GraphOps.levelDppr(pairs, membership).select(col("csrc"), col("cdst"), round(col("dppr"), 6).as("dppr")),
      """WITH sizes AS (SELECT comm, count(*)::DOUBLE AS csize FROM membership GROUP BY comm)
         SELECT ms.comm AS csrc, md.comm AS cdst,
                round(sum(p.dppr::DOUBLE) / (ss.csize * ts.csize), 6) AS dppr
         FROM pairs p JOIN membership ms ON p.src = ms.node
                      JOIN membership md ON p.dst = md.node
                      JOIN sizes ss ON ss.comm = ms.comm
                      JOIN sizes ts ON ts.comm = md.comm
         GROUP BY ms.comm, md.comm, ss.csize, ts.csize""",
      "pairs" -> pairs, "membership" -> membership)
  }

  test("levelDppr equals the Eq. 2 definition computed locally") {
    import spark.implicits._
    val pairs = Seq((0, 1, 0.5), (0, 2, 0.25), (1, 2, 0.25), (3, 0, 1.0))
      .toDF("src", "dst", "dppr")
    val membership = Seq((0, 0), (1, 0), (2, 1), (3, 1)).toDF("node", "comm")
    val got = GraphOps.levelDppr(pairs, membership).collect()
      .map(r => (r.getAs[Int]("csrc"), r.getAs[Int]("cdst")) -> r.getAs[Double]("dppr")).toMap
    // F(0)={0,1}, F(1)={2,3}: pi_d(0,0)=0.5/4, pi_d(0,1)=(0.25+0.25)/4, pi_d(1,0)=1.0/4
    assert(math.abs(got((0, 0)) - 0.125) < 1e-12)
    assert(math.abs(got((0, 1)) - 0.125) < 1e-12)
    assert(math.abs(got((1, 0)) - 0.25) < 1e-12)
  }

  test("toDF/fromDF round-trips the arc set") {
    val g2 = LocalGraph.fromDF(edges, g.n)
    assert(g2.arcs.toSet == g.arcs.toSet)
  }
}
