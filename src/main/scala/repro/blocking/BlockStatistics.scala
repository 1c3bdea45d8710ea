package repro.blocking

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Block statistics of Table 2.
  *
  * For a KB pair and its name/token blocks:
  *   |B_N|, |B_T|   — numbers of shared name / (purged) token blocks
  *   ‖B_N‖, ‖B_T‖   — total comparisons they suggest (Σ |b¹|·|b²|)
  *   |E1|·|E2|      — the Cartesian brute-force comparison count
  *   Precision      — % of suggested comparisons that are matches
  *                    (PQ: covered matches / total comparisons)
  *   Recall         — % of ground-truth matches co-occurring in ≥1 block (PC)
  *   F1             — harmonic mean of the two
  */
final case class BlockStats(
    nameBlocks: Long,
    tokenBlocks: Long,
    nameComparisons: Long,
    tokenComparisons: Long,
    cartesian: Double,
    precision: Double,
    recall: Double,
    f1: Double,
    coveredMatches: Long,
    totalMatches: Long)

object BlockStatistics {

  /** Compute Table-2 statistics.
    *
    * @param nameBlocks  shared name blocks (name, cnt1, cnt2, comparisons)
    * @param tokenBlocks purged shared token blocks (token, ef1, ef2, comparisons)
    * @param names1/2    (entity, name)
    * @param et1/2       (entity, token)
    * @param truth       ground truth (id1, id2)
    */
  def compute(
      nameBlocks: DataFrame,
      tokenBlocks: DataFrame,
      names1: DataFrame, names2: DataFrame,
      et1: DataFrame, et2: DataFrame,
      n1: Long, n2: Long,
      truth: DataFrame): BlockStats = {

    def sumLong(df: DataFrame, c: String): Long = {
      val r = df.agg(coalesce(sum(col(c)), lit(0L))).collect()(0)
      r.getLong(0)
    }

    val bN = nameBlocks.count()
    val bT = tokenBlocks.count()
    val compN = sumLong(nameBlocks, "comparisons")
    val compT = sumLong(tokenBlocks, "comparisons")

    // A truth pair is covered iff it shares a retained token or any name.
    val keptTokens = tokenBlocks.select("token")
    val t1 = et1.join(keptTokens, "token").select(col("entity") as "id1", col("token"))
    val t2 = et2.join(keptTokens, "token").select(col("entity") as "id2", col("token"))
    val coveredByToken = truth.join(t1, "id1").join(t2, Seq("id2", "token"))
      .select("id1", "id2").distinct()
    val sharedNames = nameBlocks.select("name")
    val m1 = names1.join(sharedNames, "name").select(col("entity") as "id1", col("name"))
    val m2 = names2.join(sharedNames, "name").select(col("entity") as "id2", col("name"))
    val coveredByName = truth.join(m1, "id1").join(m2, Seq("id2", "name"))
      .select("id1", "id2").distinct()
    val covered = coveredByToken.union(coveredByName).distinct().count()
    val total = truth.count()

    val comparisons = (compN + compT).toDouble
    val precision = if (comparisons == 0) 0.0 else 100.0 * covered / comparisons
    val recall = if (total == 0) 0.0 else 100.0 * covered / total
    val f1 = if (precision + recall == 0) 0.0 else 2 * precision * recall / (precision + recall)

    BlockStats(bN, bT, compN, compT, n1.toDouble * n2.toDouble,
      precision, recall, f1, covered, total)
  }
}
