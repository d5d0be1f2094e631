package repro.exp

import repro.SparkSpec
import repro.graph.GraphGen

/** Smoke tests for the table drivers on reduced workloads; the full paper
  * workloads run in `bench/` (Tables 4–11).
  */
class ExpSpec extends SparkSpec {

  test("QualityTables evaluates all 12 methods on a small graph") {
    val res = QualityTables.run(spark, graphs = Seq("TwEgo" -> GraphGen.twEgo))
    assert(res.rows.size == 12)
    PaperNumbers.QualityMethods.foreach { m =>
      val cell = res.rows(("TwEgo", m))
      assert(!cell.nd.isNaN)
      assert(cell.ar >= 0.0)
    }
  }

  test("QualityTables render interleaves paper rows") {
    val res = QualityTables.run(spark, graphs = Seq("TwEgo" -> GraphGen.twEgo))
    val out = QualityTables.render(res)
    assert(out.contains("Table 4: ND"))
    assert(out.contains("Table 5: ULCV"))
    assert(out.contains("Table 11: AR"))
    assert(out.contains("(paper)"))
    assert(out.contains("(ours)"))
  }

  test("formatters match the paper's notation") {
    assert(QualityTables.fmtNd(Double.PositiveInfinity) == "inf")
    assert(QualityTables.fmtUlcv(None) == "-")
    assert(QualityTables.fmtUlcv(Some(0.345)) == "0.35")
    assert(VariantTables.fmtResp(None) == "-")
  }

  test("paper constant tables are complete") {
    PaperNumbers.SmallGraphs.foreach { gName =>
      assert(PaperNumbers.T4_ND(gName).size == 12)
      assert(PaperNumbers.T5_ULCV(gName).size == 12)
      assert(PaperNumbers.T11_AR(gName).size == 12)
    }
    PaperNumbers.LargeGraphs.foreach { gName =>
      assert(PaperNumbers.T8_Response(gName).size == 7)
      assert(PaperNumbers.T9_Preprocessing(gName).size == 7)
      assert(PaperNumbers.T10_IndexMiB(gName).size == 7)
    }
    assert(PaperNumbers.T6.values.sum == 180)
  }

  test("UserStudy judges produce 180 verdicts in the paper's protocol shape") {
    val counts = UserStudy.run(nJudges = 2) // 2 judges × 6 groups = 12, same paths
    assert(counts.total == 12)
    assert(counts.tauPush >= 0 && counts.pi >= 0 && counts.noDifference >= 0)
  }

  test("VaryK runs on a miniature graph and reports monotone response in k") {
    val g = GraphGen.wikiII
    val rows = VaryK.run(g, ks = Seq(5, 10), paths = 1, seed = 1)
    assert(rows.map(_.k) == Seq(5, 10))
    rows.foreach { r =>
      assert(r.preprocessing > 0 && r.response > 0)
    }
  }

  test("VariantTables runs end-to-end on a miniature graph") {
    val rows = VariantTables.run(
      graphs = Seq("Mini" -> GraphGen.wikiII), k = 8, deadlineSec = 60.0, paths = 1)
    assert(rows.size == 7)
    val tau = rows.find(_.variant == "Tau-Push").get
    assert(tau.response.isDefined)
    assert(tau.indexBytes > 0)
  }
}
