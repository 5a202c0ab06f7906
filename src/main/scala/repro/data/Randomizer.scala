package repro.data

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** Randomization for the significance study (Section 6.3): keep the graph
  * structure and every timestamp fixed, and re-assign the multiset of flow
  * values onto the edges by a random permutation π. The randomized graph has
  * the same structural matches and the same δ-windows; only the flow values —
  * and hence the φ-qualifying instances — change.
  */
object Randomizer {

  /** Permute the `f` column across all interaction rows.
    *
    * Both sides are ranked by an independent `rand` ordering and joined on
    * rank — a relational formulation of "draw a random permutation". Global
    * windows run single-partition; fine at the bench scales used here.
    */
  def permuteFlows(edges: DataFrame, seed: Long): DataFrame = {
    val left = edges
      .withColumn("_rid", row_number().over(Window.orderBy(rand(seed), col("src"), col("dst"), col("t"))))
    val flows = edges.select(col("f").as("_pf"))
      .withColumn("_rid", row_number().over(Window.orderBy(rand(seed + 1), col("_pf"))))
    left.join(flows, "_rid")
      .select(col("src"), col("dst"), col("t"), col("_pf").as("f"))
  }
}
