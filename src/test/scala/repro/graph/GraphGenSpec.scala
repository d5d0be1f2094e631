package repro.graph

import org.scalatest.funsuite.AnyFunSuite

class GraphGenSpec extends AnyFunSuite {

  test("twEgo matches the paper's TwEgo size (n=23, m≈52 undirected)") {
    val g = GraphGen.twEgo
    assert(g.n == 23)
    assert(g.m / 2 >= 35 && g.m / 2 <= 75, s"undirected edges = ${g.m / 2}")
  }

  test("fbEgo matches the paper's FbEgo size (n=52, m≈146)") {
    val g = GraphGen.fbEgo
    assert(g.n == 52)
    assert(g.m / 2 >= 100 && g.m / 2 <= 220, s"undirected edges = ${g.m / 2}")
  }

  test("wikiII matches the paper's Wiki-ii size (n=186, m≈632)") {
    val g = GraphGen.wikiII
    assert(g.n == 186)
    assert(g.m / 2 >= 420 && g.m / 2 <= 900, s"undirected edges = ${g.m / 2}")
  }

  test("physician matches the paper's Physician size (n=241, m≈1.8K)") {
    val g = GraphGen.physician
    assert(g.n == 241)
    assert(g.m / 2 >= 1200 && g.m / 2 <= 2500, s"undirected edges = ${g.m / 2}")
  }

  test("filmTrust matches the paper's FilmTrust size (n=874, m≈2.6K)") {
    val g = GraphGen.filmTrust
    assert(g.n == 874)
    assert(g.m / 2 >= 1700 && g.m / 2 <= 3500, s"undirected edges = ${g.m / 2}")
  }

  test("sciNet matches the paper's SciNet size (n=1.5K, m≈5.4K)") {
    val g = GraphGen.sciNet
    assert(g.n == 1500)
    assert(g.m / 2 >= 3500 && g.m / 2 <= 8000, s"undirected edges = ${g.m / 2}")
  }

  test("generators are deterministic in the seed") {
    val a = GraphGen.powerLaw(200, 3, seed = 5)
    val b = GraphGen.powerLaw(200, 3, seed = 5)
    assert(a.arcs.toSeq == b.arcs.toSeq)
    val c = GraphGen.powerLaw(200, 3, seed = 6)
    assert(a.arcs.toSeq != c.arcs.toSeq)
  }

  test("no isolated nodes in any small graph (self-loops only for dangling)") {
    GraphGen.smallGraphs.foreach { case (name, g) =>
      (0 until g.n).foreach { v =>
        assert(g.outDeg(v) >= 1, s"$name node $v isolated")
      }
    }
  }

  test("egoNetwork hub is adjacent to the whole core") {
    val g = GraphGen.egoNetwork(20, 2, 3, 0.3, seed = 1)
    // node 0 is the hub; core is [1, 20-6)
    (1 until 14).foreach(v => assert(g.outNeighbors(0).contains(v)))
  }

  test("egoNetwork cliques are complete") {
    val g = GraphGen.egoNetwork(20, 2, 3, 0.3, seed = 1)
    val base = 20 - 6 // first clique start
    for (a <- 0 until 3; b <- 0 until 3 if a != b)
      assert(g.outNeighbors(base + a).contains(base + b))
  }

  test("powerLaw degree distribution is heavy-tailed") {
    val g    = GraphGen.powerLaw(2000, 3, seed = 9)
    val degs = (0 until g.n).map(g.outDeg).sorted.reverse
    // Hub degree far above the median — the skew Tau-Push's filter exploits.
    assert(degs.head > 10 * degs(g.n / 2), s"max=${degs.head} median=${degs(g.n / 2)}")
  }

  test("hubHeavy concentrates extra in-degree on the hubs") {
    val g = GraphGen.hubHeavy(1000, 3, 10, 2, seed = 3)
    val hubIn  = (0 until 10).map(g.inDeg).sum / 10.0
    val restIn = (10 until 1000).map(g.inDeg).sum / 990.0
    assert(hubIn > 5 * restIn)
  }

  test("smallWorld keeps ~n·k undirected edges") {
    val g = GraphGen.smallWorld(100, 4, 0.2, seed = 2)
    assert(g.m / 2 >= 350 && g.m / 2 <= 400)
  }

  test("communities yields denser within-community connectivity") {
    val g = GraphGen.communities(120, 10, 0.6, 0.005, seed = 4)
    var within = 0; var cross = 0
    g.arcs.foreach { case (s, d) => if (s % 10 == d % 10) within += 1 else cross += 1 }
    assert(within > cross)
  }

  test("large-graph stand-ins have the intended density ordering") {
    // Orkut-lite must be much denser than Youtube-lite (Table 3: Orkut has
    // ~75 edges/node vs Youtube's ~5.5).
    val y = GraphGen.youtubeLite
    val o = GraphGen.orkutLite
    assert(o.m.toDouble / o.n > 3 * (y.m.toDouble / y.n))
  }

  test("smallGraphs ordering matches the paper's table rows") {
    assert(GraphGen.smallGraphs.map(_._1) ==
      Seq("TwEgo", "FbEgo", "Wiki-ii", "Physician", "FilmTrust", "SciNet"))
  }

  test("largeGraphs ordering matches Tables 8-10 rows") {
    assert(GraphGen.largeGraphs.map(_._1) == Seq("Youtube", "Orkut", "It-2004", "Twitter"))
  }
}
