package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.{PaperNumbers, VariantTables}

/** Tables 8–10 — response time, preprocessing time and index size of the
  * PPRviz variants (PI, FORA, FORA+, ResAcc, Tau-Push, GFRA, GFP(τ_max)) on
  * the 4 largest graph stand-ins, with the paper's 1000 s response deadline
  * scaled to 20 s for our ~1000× smaller graphs.
  */
class Table8To10Bench extends AnyFunSuite {

  private lazy val rows = VariantTables.run()

  private def row(g: String, v: String) =
    rows.find(r => r.graph == g && r.variant == v).get

  test("render Tables 8/9/10 (ours vs paper)") {
    println(VariantTables.render(rows))
    assert(rows.size == 4 * 7)
  }

  test("T8 shape: PI / FORA / FORA+ / ResAcc exceed the response deadline everywhere") {
    for (g <- PaperNumbers.LargeGraphs; v <- Seq("PI", "FORA", "FORA+", "ResAcc")) {
      assert(row(g, v).response.isEmpty, s"$g/$v unexpectedly finished")
    }
  }

  test("T8 shape: Tau-Push, GFRA and GFP(tmax) answer interactively everywhere") {
    for (g <- PaperNumbers.LargeGraphs; v <- Seq("Tau-Push", "GFRA", "GFP(tmax)")) {
      val r = row(g, v).response
      assert(r.isDefined, s"$g/$v timed out")
      assert(r.get < 10.0, s"$g/$v too slow: ${r.get}s")
    }
  }

  test("T8 shape: Tau-Push is not slower than GFRA on the largest graph") {
    val tau  = row("Twitter", "Tau-Push").response.get
    val gfra = row("Twitter", "GFRA").response.get
    assert(tau <= gfra * 1.5, s"Tau-Push $tau vs GFRA $gfra")
  }

  test("T9 shape: preprocessing is comparable across variants (hierarchy dominates)") {
    PaperNumbers.LargeGraphs.foreach { g =>
      val ps = PaperNumbers.VariantNames.map(v => row(g, v).preprocessing)
      // PI/ResAcc (hierarchy only) are the floor; everything within ~5x.
      assert(ps.max <= 5 * math.max(ps.min, 0.5), s"$g preprocessing spread: $ps")
    }
  }

  test("T9 shape: PI and ResAcc have the shortest preprocessing") {
    PaperNumbers.LargeGraphs.foreach { g =>
      val pi = row(g, "PI").preprocessing
      Seq("FORA", "Tau-Push", "GFRA").foreach { v =>
        assert(pi <= row(g, v).preprocessing + 1e-9, s"$g: PI $pi vs $v")
      }
    }
  }

  test("T10 shape: index-size ordering FORA=GFRA > FORA+ > Tau-Push >= GFP(tmax) >= PI=ResAcc") {
    PaperNumbers.LargeGraphs.foreach { g =>
      val b = (v: String) => row(g, v).indexBytes
      assert(b("FORA") == b("GFRA"), g)
      assert(b("FORA") > b("FORA+"), g)
      assert(b("FORA+") > b("Tau-Push"), g)
      assert(b("Tau-Push") >= b("GFP(tmax)"), g)
      assert(b("GFP(tmax)") >= b("PI"), g)
      assert(b("PI") == b("ResAcc"), g)
    }
  }
}
