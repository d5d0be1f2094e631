package repro.ppr

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Grouped forward push as a superstep dataflow (DataFrame / Catalyst).
  *
  * Pregel pattern, partitioned by node: each superstep, every node whose
  * residue exceeds `d(v)·r_max` simultaneously converts α·r(v) into its
  * estimate and ships `(1-α)·r(v)/d(v)` along each out-edge (join on src);
  * incoming shares are combined per destination (groupBy(dst).sum). The
  * Eq. (3) invariant is preserved by every superstep regardless of push
  * order, so the result satisfies the same residue-threshold guarantee as
  * the sequential [[ForwardPush]] — tests check both land within the same
  * error envelope of the exact power-iteration answer.
  */
object PushDF {

  /** Run grouped forward push from the given initial residues.
    *
    * @param init DataFrame (node, residue) of initial residues (the Line-2
    *             initialisation of Algorithm 2: `d(v)/|F(V_i)|` on the source
    *             supernode's leaves)
    * @return DataFrame (node, est, residue) when no node is active any more
    *         (or `maxSupersteps` reached — residues then still bound error).
    */
  def forwardPush(spark: SparkSession, edges: DataFrame, init: DataFrame,
                  alpha: Double, rmax: Double, maxSupersteps: Int = 100): DataFrame = {
    val degs = edges
      .groupBy(col("src").as("node"))
      .agg(count(lit(1)).cast("double").as("outdeg"))
      .cache()

    var state = degs
      .join(init, Seq("node"), "left_outer")
      .select(col("node"), col("outdeg"),
              coalesce(col("residue"), lit(0.0)).as("residue"),
              lit(0.0).as("est"))
      .localCheckpoint(eager = true)

    var step = 0
    var activeCount =
      state.filter(col("residue") > col("outdeg") * rmax).count()
    while (activeCount > 0 && step < maxSupersteps) {
      val active = state.filter(col("residue") > col("outdeg") * rmax)
      val shipped = edges
        .join(active.select(col("node").as("src"), col("residue"), col("outdeg")), "src")
        .select(col("dst").as("node"),
                (lit(1.0 - alpha) * col("residue") / col("outdeg")).as("share"))
        .groupBy("node")
        .agg(sum("share").as("inmass"))
      state = state
        .withColumn("act", col("residue") > col("outdeg") * rmax)
        .join(shipped, Seq("node"), "left_outer")
        .select(
          col("node"), col("outdeg"),
          (when(col("act"), lit(0.0)).otherwise(col("residue"))
            + coalesce(col("inmass"), lit(0.0))).as("residue"),
          (col("est") + when(col("act"), lit(alpha) * col("residue")).otherwise(lit(0.0))).as("est"),
        )
        .localCheckpoint(eager = true)
      activeCount = state.filter(col("residue") > col("outdeg") * rmax).count()
      step += 1
    }
    state.select(col("node"), col("est"), col("residue"))
  }
}
