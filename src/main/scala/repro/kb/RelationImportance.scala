package repro.kb

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** Relation-importance statistics and top-neighbor extraction (paper §2.2,
  * Algorithm 1 lines 35–48).
  *
  * For a relation p of a KB E:
  *   support(p)         = |instances(p)| / |E|²      (Def 2.2)
  *   discriminability(p)= |objects(p)| / |instances(p)|  (Def 2.3)
  *   importance(p)      = harmonic mean of the two
  *
  * Per entity, its relations are ordered by the *global* importance score
  * and the top-N retained; the objects reachable through them are the
  * entity's `topNneighbors`. `topInNeighbors` is the reverse mapping.
  */
object RelationImportance {

  /** Per-relation statistics of one KB.
    * Output: (pred, instances, objects, support, discriminability, importance).
    */
  def relationScores(kb: DataFrame): DataFrame = {
    val nEntities = KBModel.entityCount(kb).toDouble
    val inst = KBModel.relationTriples(kb)
      .select("subj", "pred", "objId").distinct()
    inst.groupBy("pred")
      .agg(count(lit(1)) as "instances", countDistinct("objId") as "objects")
      .withColumn("support", col("instances") / lit(nEntities * nEntities))
      .withColumn("discriminability", col("objects") / col("instances"))
      .withColumn("importance",
        lit(2.0) * col("support") * col("discriminability") /
          (col("support") + col("discriminability")))
  }

  /** Per-entity top-N relations by global importance.
    * Output: (entity, pred, importance, relRank). Ties broken by pred for
    * determinism.
    */
  def topNRelations(kb: DataFrame, n: Int): DataFrame = {
    val scores = relationScores(kb).select("pred", "importance")
    val entRel = KBModel.entityRelations(kb)
    val w = Window.partitionBy("entity").orderBy(col("importance").desc, col("pred"))
    entRel.join(scores, "pred")
      .withColumn("relRank", row_number().over(w))
      .filter(col("relRank") <= n)
      .select("entity", "pred", "importance", "relRank")
  }

  /** `topNneighbors(e)`: distinct neighbors reachable via the entity's
    * top-N relations. Output: (entity, neighbor).
    */
  def topNeighbors(kb: DataFrame, n: Int): DataFrame = {
    val top = topNRelations(kb, n).select("entity", "pred")
    KBModel.relationTriples(kb)
      .select(col("subj") as "entity", col("pred"), col("objId") as "neighbor")
      .join(top, Seq("entity", "pred"))
      .select("entity", "neighbor")
      .distinct()
  }

  /** `topInNeighbors`: for every entity, the entities that list it among
    * their topNneighbors (Alg 1 lines 44–47).
    * Output: (entity, inNeighbor) — `inNeighbor` has `entity` as top neighbor.
    */
  def topInNeighbors(kb: DataFrame, n: Int): DataFrame =
    topNeighbors(kb, n)
      .select(col("neighbor") as "entity", col("entity") as "inNeighbor")
}
