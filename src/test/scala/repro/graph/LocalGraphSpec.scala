package repro.graph

import org.scalatest.funsuite.AnyFunSuite

class LocalGraphSpec extends AnyFunSuite {

  test("fromArcs builds the expected out-adjacency") {
    val g = LocalGraph.fromArcs(4, Seq((0, 1), (0, 2), (1, 2), (2, 0), (3, 0)))
    assert(g.n == 4)
    assert(g.outNeighbors(0).toSet == Set(1, 2))
    assert(g.outNeighbors(1).toSet == Set(2))
    assert(g.outNeighbors(2).toSet == Set(0))
    assert(g.outNeighbors(3).toSet == Set(0))
  }

  test("fromArcs builds the matching in-adjacency") {
    val g = LocalGraph.fromArcs(4, Seq((0, 1), (0, 2), (1, 2), (2, 0), (3, 0)))
    assert(g.inNeighbors(0).toSet == Set(2, 3))
    assert(g.inNeighbors(1).toSet == Set(0))
    assert(g.inNeighbors(2).toSet == Set(0, 1))
    assert(g.inNeighbors(3).isEmpty)
  }

  test("parallel arcs are deduplicated") {
    val g = LocalGraph.fromArcs(2, Seq((0, 1), (0, 1), (0, 1), (1, 0)))
    assert(g.m == 2)
  }

  test("self-loops in the input are dropped (non-dangling nodes)") {
    val g = LocalGraph.fromArcs(2, Seq((0, 0), (0, 1), (1, 0)))
    assert(g.outNeighbors(0).toSet == Set(1))
  }

  test("dangling nodes receive a self-loop") {
    val g = LocalGraph.fromArcs(3, Seq((0, 1), (1, 0)))
    assert(g.outDeg(2) == 1)
    assert(g.outNeighbors(2) == Seq(2))
  }

  test("out-degree sums equal m") {
    val g = GraphGen.twEgo
    assert((0 until g.n).map(g.outDeg).sum == g.m)
  }

  test("in-degree sums equal m") {
    val g = GraphGen.twEgo
    assert((0 until g.n).map(g.inDeg).sum == g.m)
  }

  test("undirected constructor adds both arcs") {
    val g = LocalGraph.undirected(3, Seq((0, 1), (1, 2)))
    assert(g.outNeighbors(1).toSet == Set(0, 2))
    assert(g.m == 4)
  }

  test("arcs iterator matches adjacency") {
    val g = LocalGraph.fromArcs(3, Seq((0, 1), (1, 2), (2, 0)))
    assert(g.arcs.toSet == Set((0, 1), (1, 2), (2, 0)))
  }

  test("out-of-range arc is rejected") {
    intercept[IllegalArgumentException] {
      LocalGraph.fromArcs(2, Seq((0, 5)))
    }
  }

  test("foreachOut visits exactly the out-neighbours") {
    val g = LocalGraph.fromArcs(4, Seq((0, 1), (0, 3), (1, 0)))
    val seen = scala.collection.mutable.ArrayBuffer.empty[Int]
    g.foreachOut(0)(seen += _)
    assert(seen.toSet == Set(1, 3))
  }

  test("foreachIn visits exactly the in-neighbours") {
    val g = LocalGraph.fromArcs(4, Seq((0, 1), (2, 1), (1, 0)))
    val seen = scala.collection.mutable.ArrayBuffer.empty[Int]
    g.foreachIn(1)(seen += _)
    assert(seen.toSet == Set(0, 2))
  }

  test("property: every node of an undirected random graph has outdeg == indeg") {
    val rnd = new java.util.Random(1)
    (0 until 25).foreach { _ =>
      val es = Seq.fill(30)((rnd.nextInt(10), rnd.nextInt(10)))
      val g  = LocalGraph.undirected(10, es)
      (0 until 10).foreach(v => assert(g.outDeg(v) == g.inDeg(v)))
    }
  }

  test("property: in-adjacency is the transpose of out-adjacency") {
    val rnd = new java.util.Random(2)
    (0 until 25).foreach { _ =>
      val es = Seq.fill(25)((rnd.nextInt(8), rnd.nextInt(8)))
      val g  = LocalGraph.fromArcs(8, es)
      val outPairs = g.arcs.toSet
      val inPairs  = (0 until 8).flatMap(v => g.inNeighbors(v).map(u => (u, v))).toSet
      assert(outPairs == inPairs)
    }
  }
}
