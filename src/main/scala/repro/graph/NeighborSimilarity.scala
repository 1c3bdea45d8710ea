package repro.graph

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Neighbor-evidence (γ) computation — Definition 2.5 as estimated by
  * Algorithm 1 lines 20–33.
  *
  * For every retained value edge (e1, e2, β) and every pair of
  * in-neighbors (in1 of e1, in2 of e2) — entities that have e1 (resp. e2)
  * among their topNneighbors — the edge contributes β to γ(in1, in2).
  * Summing over all value edges yields
  *   γ(a, b) = Σ_{(na, nb) ∈ topN(a)×topN(b), β-edge retained} valueSim(na, nb)
  * i.e. neighborNSim restricted to the pruned value edges — exactly the
  * approximation the paper's algorithm makes to avoid recomputation.
  */
object NeighborSimilarity {

  /** γ pairs.
    *
    * @param betaEdges retained value pairs (e1, e2, beta) — undirected,
    *                  i.e. the distinct union of both pruning directions
    * @param inN1 (entity, inNeighbor) of KB1 — from
    *             [[repro.kb.RelationImportance.topInNeighbors]]
    * @param inN2 (entity, inNeighbor) of KB2
    * @return (e1, e2, gamma) over in-neighbor pairs
    */
  def gammaPairs(betaEdges: DataFrame, inN1: DataFrame, inN2: DataFrame): DataFrame = {
    val r1 = inN1.select(col("entity") as "e1", col("inNeighbor") as "in1")
    val r2 = inN2.select(col("entity") as "e2", col("inNeighbor") as "in2")
    betaEdges
      .join(r1, "e1")
      .join(r2, "e2")
      .groupBy(col("in1") as "e1", col("in2") as "e2")
      .agg(sum("beta") as "gamma")
  }
}
