package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.UserStudy

/** Table 6 — simulated user study (task T3): Tau-Push vs PI visualizations
  * over FilmTrust/SciNet × k ∈ {15,20,25}, 30 judges × 6 groups.
  */
class Table6Bench extends AnyFunSuite {

  private lazy val counts = UserStudy.run()

  test("render Table 6 (ours vs paper)") {
    println(UserStudy.render(counts))
    assert(counts.total == 180)
  }

  test("T6 shape: 'no difference' is the most frequent verdict") {
    // The paper's claim: participants mostly cannot tell Tau-Push from PI.
    assert(counts.noDifference >= counts.tauPush)
    assert(counts.noDifference >= counts.pi)
  }

  test("T6 shape: Tau-Push and PI are picked comparably often") {
    val hi = math.max(counts.tauPush, counts.pi)
    val lo = math.min(counts.tauPush, counts.pi)
    assert(hi <= 3 * lo + 10, s"picks unbalanced: ${counts.tauPush} vs ${counts.pi}")
  }
}
