package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

import scala.collection.mutable

/** Unique Mapping Clustering (paper §5): process candidate pairs in
  * decreasing similarity; accept a pair as a match iff neither entity has
  * been matched yet; stop below the similarity threshold.
  *
  * The greedy pass is inherently sequential, so it runs on the driver over
  * Spark-precomputed scores. Candidate sets are bounded by blocking; a
  * per-entity top-`capPerEntity` window keeps the collected volume safe —
  * pairs beyond an entity's cap can only be accepted after the entity is
  * already matched, where they would be rejected anyway in the overwhelming
  * majority of orders, and the swept thresholds make the residual
  * difference irrelevant (documented deviation).
  */
object UniqueMappingClustering {

  /** Driver-side greedy pass over scored pairs. Deterministic: ties broken
    * by (e1, e2).
    */
  def cluster(pairs: Seq[(Long, Long, Double)], threshold: Double): Seq[(Long, Long)] = {
    val sorted = pairs.sortBy { case (a, b, s) => (-s, a, b) }
    val used1 = mutable.Set.empty[Long]
    val used2 = mutable.Set.empty[Long]
    val out = mutable.ArrayBuffer.empty[(Long, Long)]
    var i = 0
    while (i < sorted.length && sorted(i)._3 >= threshold) {
      val (a, b, _) = sorted(i)
      if (!used1(a) && !used2(b)) {
        used1 += a; used2 += b; out += ((a, b))
      }
      i += 1
    }
    out.toSeq
  }

  /** Collect scored pairs (e1, e2, score) with a per-entity cap, ready for
    * [[cluster]]. Pairs with score ≤ 0 are dropped.
    */
  def collectCandidates(
      scored: DataFrame,
      capPerEntity: Int = 50): Seq[(Long, Long, Double)] = {
    val w1 = Window.partitionBy("e1").orderBy(col("score").desc, col("e2"))
    val w2 = Window.partitionBy("e2").orderBy(col("score").desc, col("e1"))
    scored
      .filter(col("score") > 0)
      .withColumn("r1", row_number().over(w1))
      .withColumn("r2", row_number().over(w2))
      .filter(col("r1") <= capPerEntity || col("r2") <= capPerEntity)
      .select("e1", "e2", "score")
      .collect()
      .map(r => (r.getLong(0), r.getLong(1), r.getDouble(2)))
      .toSeq
  }

  /** Multi-score variant: collect (e1, e2, scores[]) for several score
    * columns at once; the per-entity cap windows use the max score across
    * columns (conservative — may keep extra rows, never drops a row that
    * any single-column cap would keep).
    */
  def collectCandidatesMulti(
      scored: DataFrame,
      scoreCols: Seq[String],
      capPerEntity: Int = 50): Seq[(Long, Long, Array[Double])] = {
    val best = greatest(scoreCols.map(col): _*)
    val w1 = Window.partitionBy("e1").orderBy(best.desc, col("e2"))
    val w2 = Window.partitionBy("e2").orderBy(best.desc, col("e1"))
    scored
      .filter(best > 0)
      .withColumn("r1", row_number().over(w1))
      .withColumn("r2", row_number().over(w2))
      .filter(col("r1") <= capPerEntity || col("r2") <= capPerEntity)
      .select((Seq(col("e1"), col("e2")) ++ scoreCols.map(col)): _*)
      .collect()
      .map(r => (r.getLong(0), r.getLong(1),
        scoreCols.indices.map(i => r.getDouble(2 + i)).toArray))
      .toSeq
  }

  /** DataFrame wrapper: cluster scored pairs and return matches (e1, e2). */
  def clusterDf(spark: SparkSession, scored: DataFrame, threshold: Double,
                capPerEntity: Int = 50): DataFrame = {
    import spark.implicits._
    cluster(collectCandidates(scored, capPerEntity), threshold)
      .toDF("e1", "e2")
  }
}
