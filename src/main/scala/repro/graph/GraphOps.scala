package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Dataflow-layer graph operations (Spark DataFrame / Catalyst).
  *
  * These are the relational pieces of PPRviz: degree computation, weighted
  * supergraph aggregation (the high-level graph drawn when a supernode's
  * children are themselves supernodes, §2.2), and the Eq. 2 level-ℓ DPPR
  * aggregation. Each has a direct SQL equivalent and is oracle-checked
  * against DuckDB in the test suites.
  */
object GraphOps {

  /** Out-degrees: one row per node with at least one outgoing arc. */
  def outDegrees(edges: DataFrame): DataFrame =
    edges.groupBy(col("src").as("node")).agg(count(lit(1)).as("outdeg"))

  /** In-degrees: one row per node with at least one incoming arc. */
  def inDegrees(edges: DataFrame): DataFrame =
    edges.groupBy(col("dst").as("node")).agg(count(lit(1)).as("indeg"))

  /** Weighted supergraph edges: given leaf arcs and a membership relation
    * (node → comm), each supergraph arc (csrc, cdst) carries the number of
    * leaf arcs crossing from comm csrc to comm cdst (§2.2: "each edge
    * connects supernode Vi to Vj if G contains an edge from a leaf of Vi to a
    * leaf of Vj").
    */
  def superEdges(edges: DataFrame, membership: DataFrame): DataFrame = {
    val ms = membership.select(col("node").as("src"), col("comm").as("csrc"))
    val md = membership.select(col("node").as("dst"), col("comm").as("cdst"))
    edges
      .join(ms, "src")
      .join(md, "dst")
      .groupBy("csrc", "cdst")
      .agg(count(lit(1)).as("weight"))
  }

  /** Eq. 2 — level-ℓ DPPR from a leaf-pair DPPR relation.
    *
    * `dpprPairs` has columns (src, dst, dppr) holding leaf-level DPPR values;
    * the result has one row per (csrc, cdst) community pair with
    * `pi_d(Vi, Vj) = sum(dppr over F(Vi) x F(Vj)) / (|F(Vi)| * |F(Vj)|)`.
    * Pairs absent from `dpprPairs` contribute zero, exactly as in Eq. 2.
    */
  def levelDppr(dpprPairs: DataFrame, membership: DataFrame): DataFrame = {
    val sizes = membership.groupBy("comm").agg(count(lit(1)).as("csize"))
    val ms = membership.select(col("node").as("src"), col("comm").as("csrc"))
    val md = membership.select(col("node").as("dst"), col("comm").as("cdst"))
    dpprPairs
      .join(ms, "src")
      .join(md, "dst")
      .groupBy("csrc", "cdst")
      .agg(sum("dppr").as("dpprsum"))
      .join(sizes.select(col("comm").as("csrc"), col("csize").as("ssize")), "csrc")
      .join(sizes.select(col("comm").as("cdst"), col("csize").as("tsize")), "cdst")
      .select(
        col("csrc"), col("cdst"),
        (col("dpprsum") / (col("ssize") * col("tsize"))).as("dppr"),
      )
  }

  /** Statistics row for a named graph — reproduces Table 3 for our synthetic
    * stand-ins (n, directed arc count m).
    */
  def stats(spark: SparkSession, name: String, g: LocalGraph): (String, Int, Int) =
    (name, g.n, g.m)
}
