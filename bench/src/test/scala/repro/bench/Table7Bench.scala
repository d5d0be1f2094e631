package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.VaryK

/** Table 7 — PPRviz preprocessing/response time vs cluster-size limit k on
  * the Twitter stand-in.
  */
class Table7Bench extends AnyFunSuite {

  private lazy val rows = VaryK.run()

  test("render Table 7 (ours vs paper)") {
    println(VaryK.render(rows))
    assert(rows.map(_.k) == Seq(5, 10, 25, 50, 100))
  }

  test("T7 shape: response time grows with k") {
    // More children per visualization → more pairwise PDist work.
    assert(rows.last.response > rows.head.response,
      s"response at k=100 (${rows.last.response}) not above k=5 (${rows.head.response})")
  }

  test("T7 shape: every response is interactive (sub-deadline)") {
    rows.foreach(r => assert(r.response < 10.0, s"k=${r.k}: ${r.response}s"))
  }

  test("T7 shape: preprocessing does not blow up with k") {
    // The paper sees mildly *decreasing* preprocessing as k grows (fewer
    // levels); we assert it stays within a 4x band across k.
    val ps = rows.map(_.preprocessing)
    assert(ps.max <= 4 * ps.min, s"preprocessing band too wide: $ps")
  }
}
