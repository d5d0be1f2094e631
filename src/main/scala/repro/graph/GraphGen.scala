package repro.graph

import java.util.Random

/** Deterministic synthetic graph generators.
  *
  * The paper evaluates on 12 real-world graphs (Table 3). The sealed
  * container has neither network access nor room for billion-edge inputs, so
  * each dataset is replaced by a deterministic synthetic stand-in of the same
  * structural genre (see DESIGN.md §3 for the substitution argument):
  *
  *   - small graphs match the paper's (n, m) and genre (ego / social /
  *     authorship / trust / collaboration network);
  *   - large graphs are scaled-down power-law graphs preserving the density
  *     regime (sparse Amazon vs dense Orkut vs hub-heavy Twitter).
  *
  * All generators are deterministic in their seed.
  */
object GraphGen {

  /** Ego network: one hub adjacent to everyone, a densely connected core, and
    * a few outlying cliques (the "well-connected cluster + cliques" structure
    * the paper shows for TwEgo/FbEgo in Figs. 2 and 9).
    */
  def egoNetwork(n: Int, nCliques: Int, cliqueSize: Int, pCore: Double, seed: Long): LocalGraph = {
    val rnd    = new Random(seed)
    val pairs  = scala.collection.mutable.ArrayBuffer.empty[(Int, Int)]
    val nOut   = nCliques * cliqueSize
    val coreLo = 1            // node 0 is the hub
    val coreHi = n - nOut     // [coreLo, coreHi) is the core
    require(coreHi > coreLo, s"egoNetwork: n=$n too small for $nCliques cliques of $cliqueSize")
    // Hub adjacent to all core nodes.
    (coreLo until coreHi).foreach(v => pairs += ((0, v)))
    // Dense core.
    for (a <- coreLo until coreHi; b <- (a + 1) until coreHi)
      if (rnd.nextDouble() < pCore) pairs += ((a, b))
    // Cliques, each attached to the hub through its first member.
    for (c <- 0 until nCliques) {
      val base = coreHi + c * cliqueSize
      for (a <- 0 until cliqueSize; b <- (a + 1) until cliqueSize)
        pairs += ((base + a, base + b))
      pairs += ((0, base))
    }
    LocalGraph.undirected(n, pairs)
  }

  /** Watts–Strogatz small-world graph: ring lattice with `k` nearest
    * neighbours per side, each edge rewired with probability `beta`.
    */
  def smallWorld(n: Int, k: Int, beta: Double, seed: Long): LocalGraph = {
    val rnd   = new Random(seed)
    val pairs = scala.collection.mutable.ArrayBuffer.empty[(Int, Int)]
    for (v <- 0 until n; j <- 1 to k) {
      val u = (v + j) % n
      if (rnd.nextDouble() < beta) {
        var w = rnd.nextInt(n)
        var tries = 0
        while ((w == v || w == u) && tries < 10) { w = rnd.nextInt(n); tries += 1 }
        pairs += ((v, w))
      } else pairs += ((v, u))
    }
    LocalGraph.undirected(n, pairs)
  }

  /** Barabási–Albert preferential attachment: each new node attaches
    * `mPerNode` edges to existing nodes chosen ∝ degree. Produces the
    * power-law degree (and hence DPR, Fig. 6) distribution that Tau-Push's
    * filter step exploits.
    */
  def powerLaw(n: Int, mPerNode: Int, seed: Long): LocalGraph = {
    val rnd   = new Random(seed)
    val pairs = scala.collection.mutable.ArrayBuffer.empty[(Int, Int)]
    // Endpoint pool for degree-proportional sampling.
    val pool  = scala.collection.mutable.ArrayBuffer.empty[Int]
    val m0    = math.max(2, mPerNode)
    for (a <- 0 until m0; b <- (a + 1) until (m0 + 1)) {
      pairs += ((a, b)); pool += a; pool += b
    }
    for (v <- (m0 + 1) until n) {
      val chosen = scala.collection.mutable.Set.empty[Int]
      while (chosen.size < math.min(mPerNode, v)) chosen += pool(rnd.nextInt(pool.size))
      chosen.foreach { u => pairs += ((v, u)); pool += v; pool += u }
    }
    LocalGraph.undirected(n, pairs)
  }

  /** Planted-partition community graph: `nComm` equal communities, edge
    * probability `pIn` inside and `pOut` across. Collaboration-network
    * stand-in (communities of near-cliques, sparse bridges).
    */
  def communities(n: Int, nComm: Int, pIn: Double, pOut: Double, seed: Long): LocalGraph = {
    val rnd   = new Random(seed)
    val pairs = scala.collection.mutable.ArrayBuffer.empty[(Int, Int)]
    def comm(v: Int): Int = v % nComm
    // Within-community pairs are enumerated directly (community sizes are
    // small); cross-community edges are sampled by expected count so the
    // generator stays O(m) instead of O(n^2).
    val members = Array.fill(nComm)(scala.collection.mutable.ArrayBuffer.empty[Int])
    (0 until n).foreach(v => members(comm(v)) += v)
    members.foreach { ms =>
      for (i <- ms.indices; j <- (i + 1) until ms.size)
        if (rnd.nextDouble() < pIn) pairs += ((ms(i), ms(j)))
    }
    val withinPairs = members.map(ms => ms.size.toLong * (ms.size - 1) / 2).sum
    val crossPairs  = n.toLong * (n - 1) / 2 - withinPairs
    val nCross      = math.round(crossPairs * pOut)
    var drawn = 0L
    while (drawn < nCross) {
      val a = rnd.nextInt(n); val b = rnd.nextInt(n)
      if (a != b && comm(a) != comm(b)) { pairs += ((math.min(a, b), math.max(a, b))); drawn += 1 }
    }
    // Guarantee no isolated node: chain each community.
    for (v <- nComm until n) pairs += ((v, v - nComm))
    LocalGraph.undirected(n, pairs)
  }

  /** Hub-heavy power-law graph: BA backbone plus extra arcs into a small set
    * of celebrity hubs — Twitter/It-2004 stand-in with extreme in-degree
    * skew.
    */
  def hubHeavy(n: Int, mPerNode: Int, nHubs: Int, extraPerNode: Int, seed: Long): LocalGraph = {
    val base = powerLaw(n, mPerNode, seed)
    val rnd  = new Random(seed + 1)
    val extra = (0 until n).iterator.flatMap { v =>
      (0 until extraPerNode).map(_ => (v, rnd.nextInt(nHubs)))
    }
    LocalGraph.fromArcs(n, base.arcs ++ extra)
  }

  // ---------------------------------------------------------------------
  // Named stand-ins for the paper's 12 datasets (Table 3).
  // ---------------------------------------------------------------------

  /** TwEgo — n=23, undirected m≈52. */
  def twEgo: LocalGraph = egoNetwork(23, 3, 4, 0.45, seed = 11)

  /** FbEgo — n=52, undirected m≈146. */
  def fbEgo: LocalGraph = egoNetwork(52, 3, 5, 0.22, seed = 12)

  /** Wiki-ii authorship network — n=186, m≈632. */
  def wikiII: LocalGraph = communities(186, 12, 0.42, 0.004, seed = 13)

  /** Physician social network — n=241, m≈1.8K. */
  def physician: LocalGraph = smallWorld(241, 8, 0.25, seed = 14)

  /** FilmTrust user-trust network — n=874, m≈2.6K. */
  def filmTrust: LocalGraph = powerLaw(874, 3, seed = 15)

  /** SciNet collaboration network — n=1.5K, m≈5.4K. */
  def sciNet: LocalGraph = communities(1500, 120, 0.55, 0.0006, seed = 16)

  /** Scaled-down stand-ins for the 6 large graphs; see DESIGN.md §3. */
  def amazonLite: LocalGraph  = powerLaw(20_000, 3, seed = 21)
  def youtubeLite: LocalGraph = powerLaw(30_000, 3, seed = 22)
  def orkutLite: LocalGraph   = powerLaw(30_000, 15, seed = 23)
  def dblpLite: LocalGraph    = communities(40_000, 8000, 0.6, 1e-5, seed = 24)
  def it2004Lite: LocalGraph  = hubHeavy(50_000, 8, 40, 4, seed = 25)
  def twitterLite: LocalGraph = hubHeavy(60_000, 10, 50, 5, seed = 26)

  /** The 6 small quality-evaluation graphs in paper order. */
  def smallGraphs: Seq[(String, LocalGraph)] = Seq(
    "TwEgo"     -> twEgo,
    "FbEgo"     -> fbEgo,
    "Wiki-ii"   -> wikiII,
    "Physician" -> physician,
    "FilmTrust" -> filmTrust,
    "SciNet"    -> sciNet,
  )

  /** The 4 largest graphs used in Tables 8–10, in paper order. */
  def largeGraphs: Seq[(String, LocalGraph)] = Seq(
    "Youtube" -> youtubeLite,
    "Orkut"   -> orkutLite,
    "It-2004" -> it2004Lite,
    "Twitter" -> twitterLite,
  )
}
