package repro.ppr

import repro.SparkSpec
import repro.graph.GraphGen

/** The dataflow-layer grouped forward push (superstep Pregel pattern in
  * Catalyst) must land in the same error envelope as the sequential push.
  */
class PushDFSpec extends SparkSpec {

  private val alpha = 0.2
  private lazy val g = GraphGen.twEgo
  private lazy val exact = PowerIteration.dpprMatrix(g, alpha)

  private def runDF(src: Int, rmax: Double): (Map[Int, Double], Map[Int, Double]) = {
    import spark.implicits._
    val init  = Seq((src, g.outDeg(src).toDouble)).toDF("node", "residue")
    val out   = PushDF.forwardPush(spark, g.toDF(spark), init, alpha, rmax).collect()
    val est   = out.map(r => r.getAs[Int]("node") -> r.getAs[Double]("est")).toMap
    val resid = out.map(r => r.getAs[Int]("node") -> r.getAs[Double]("residue")).toMap
    (est, resid)
  }

  test("superstep push terminates with all residues below d(v)·rmax") {
    val rmax = 0.01
    val (_, resid) = runDF(0, rmax)
    (0 until g.n).foreach { v =>
      assert(resid.getOrElse(v, 0.0) <= g.outDeg(v) * rmax + 1e-12)
    }
  }

  test("superstep push estimates under-approximate exact DPPR") {
    val (est, _) = runDF(0, 0.01)
    (0 until g.n).foreach { j =>
      assert(est.getOrElse(j, 0.0) <= exact(0)(j) + 1e-9)
    }
  }

  test("superstep push meets the residue-sum error bound") {
    // From Eq. 3: exact - est <= Σ_k r(k)/d(k) · π_d(k,j) <= rmax · Σ_k π_d(k,j).
    val rmax = 0.02
    val (est, _) = runDF(1, rmax)
    (0 until g.n).foreach { j =>
      val colSum = (0 until g.n).map(k => exact(k)(j)).sum
      assert(exact(1)(j) - est.getOrElse(j, 0.0) <= rmax * colSum + 1e-9)
    }
  }

  test("superstep push conserves mass") {
    val (est, resid) = runDF(2, 0.05)
    val total = est.values.sum + resid.values.sum
    assert(math.abs(total - g.outDeg(2)) < 1e-9)
  }

  test("dataflow and sequential push agree when run to near-exhaustion") {
    val rmax = 1e-6
    val (est, _) = runDF(0, rmax)
    val local = ForwardPush.dppr(g, 0, alpha, rmax)
    (0 until g.n).foreach { j =>
      assert(math.abs(est.getOrElse(j, 0.0) - local.est(j)) < 1e-3, s"node $j")
    }
  }
}
