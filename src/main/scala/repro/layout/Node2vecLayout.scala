package repro.layout

import java.util.Random
import org.apache.spark.mllib.feature.Word2Vec
import org.apache.spark.sql.SparkSession
import repro.graph.LocalGraph

/** Node2vec [31] baseline: a corpus of truncated random walks fed to
  * skip-gram (Spark MLlib Word2Vec) with vectorSize = 2, the embedding used
  * directly as the position matrix ([30]'s visualization recipe). Uniform
  * second-order walks (p = q = 1, the DeepWalk parameterisation) — see
  * DESIGN.md §3.
  */
object Node2vecLayout {

  def layout(spark: SparkSession, g: LocalGraph, walksPerNode: Int = 10,
             walkLen: Int = 40, seed: Long = 0): Array[Array[Double]] = {
    val rnd = new Random(seed)
    val adj = ShortestPaths.undirectedAdj(g)
    val corpus = for {
      v <- 0 until g.n
      _ <- 0 until walksPerNode
    } yield {
      val walk = new Array[String](walkLen)
      var cur  = v
      var i    = 0
      while (i < walkLen) {
        walk(i) = cur.toString
        if (adj(cur).nonEmpty) cur = adj(cur)(rnd.nextInt(adj(cur).length))
        i += 1
      }
      walk.toSeq
    }
    val rdd = spark.sparkContext.parallelize(corpus, 8)
    val model = new Word2Vec()
      .setVectorSize(2)
      .setMinCount(0)
      .setSeed(seed)
      .setNumIterations(3)
      .fit(rdd)
    val vecs = model.getVectors
    Array.tabulate(g.n) { v =>
      vecs.get(v.toString) match {
        case Some(arr) => Array(arr(0).toDouble, arr(1).toDouble)
        case None      => Array(rnd.nextDouble(), rnd.nextDouble())
      }
    }
  }
}
