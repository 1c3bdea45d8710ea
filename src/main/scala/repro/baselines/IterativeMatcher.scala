package repro.baselines

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

import repro.core.UniqueMappingClustering
import repro.kb.{KBModel, NameDiscovery, Tokenizer}
import repro.blocking.TokenBlocking

import scala.collection.mutable

/** Greedy collective-matching engine behind SiGMa-lite, LINDA-lite and
  * RiMOM-lite (paper §5, “Entity Matching”).
  *
  * All three published systems share the same skeleton: start from seed
  * matches, keep a priority queue of candidate pairs scored by
  * `θ·valueSim + (1−θ)·graphSim`, repeatedly accept the best pair whose
  * entities are both unmatched (Unique Mapping Clustering), and propagate:
  * every acceptance raises the graph score of neighbor pairs connected via
  * *compatible* relations. They differ in where relation compatibility
  * comes from and in their acceptance thresholds — captured here by
  * [[IterConfig]].
  *
  * Value scores and candidate generation are Spark jobs (token blocking +
  * normalized TF-IDF similarity); the greedy loop is inherently sequential
  * and runs on the driver, as in the original (non-parallel) systems.
  */
object IterativeMatcher {

  /** Relation-compatibility oracle: weight in [0, 1] per relation pair. */
  type RelCompat = (String, String) => Double

  final case class IterConfig(
      valueWeight: Double,       // θ
      threshold: Double,         // stop when best score drops below this
      relCompat: RelCompat,
      seedFromNames: Boolean = true,
      /** RiMOM-IM heuristic: if all but one neighbor pair of a matched pair
        * (via compatible relations) are matched, match the remaining pair.
        */
      siblingCompletion: Boolean = false,
      capPerEntity: Int = 30,
      maxAccepted: Int = 2000000)

  /** Normalized edit similarity of relation names (LINDA-style compat). */
  def editSimilarity(a: String, b: String): Double = {
    val la = a.length; val lb = b.length
    if (la == 0 && lb == 0) return 1.0
    val d = Array.tabulate(la + 1)(i => Array.tabulate(lb + 1)(j => 0))
    for (i <- 0 to la) d(i)(0) = i
    for (j <- 0 to lb) d(0)(j) = j
    for (i <- 1 to la; j <- 1 to lb) {
      val cost = if (a(i - 1) == b(j - 1)) 0 else 1
      d(i)(j) = math.min(math.min(d(i - 1)(j) + 1, d(i)(j - 1) + 1), d(i - 1)(j - 1) + cost)
    }
    1.0 - d(la)(lb).toDouble / math.max(la, lb)
  }

  /** Candidate value scores: normalized SiGMa-style TF-IDF similarity over
    * unigram tokens, restricted to purged token-block pairs.
    * Output: (e1, e2, score ∈ [0, 1]).
    */
  def valueScores(kb1: DataFrame, kb2: DataFrame): DataFrame = {
    val g1 = BSL.ngrams(kb1, 1)
    val g2 = BSL.ngrams(kb2, 1)
    val et1 = Tokenizer.entityTokens(kb1)
    val et2 = Tokenizer.entityTokens(kb2)
    val (blocks, _) = TokenBlocking.purgedSharedBlocks(et1, et2)
    val pairs = et1.select(col("entity") as "e1", col("token"))
      .join(blocks.select("token"), "token")
      .join(et2.select(col("entity") as "e2", col("token")), "token")
      .select("e1", "e2").distinct()
    BSL.pairSimilarities(g1, g2, pairs, BSL.TFIDF)
      .select(col("e1"), col("e2"), col("sigma") as "score")
      .filter(col("score") > 0)
  }

  /** Seed pairs: 1×1 identical-name blocks (SiGMa starts from identical
    * entity names).
    */
  def nameSeeds(kb1: DataFrame, kb2: DataFrame, k: Int = 2): DataFrame = {
    val n1 = NameDiscovery.names(kb1, k)
    val n2 = NameDiscovery.names(kb2, k)
    repro.blocking.NameBlocking.alphaEdges(n1, n2)
  }

  /** Neighbor adjacency collected to the driver: entity → Seq[(pred, neighbor)]. */
  private def adjacency(kb: DataFrame): Map[Long, Seq[(String, Long)]] =
    KBModel.relationTriples(kb).select("subj", "pred", "objId").distinct()
      .collect()
      .map(r => (r.getLong(0), r.getString(1), r.getLong(2)))
      .groupBy(_._1)
      .map { case (k2, v) => k2 -> v.map(t => (t._2, t._3)).toSeq }

  /** Run the greedy collective matcher; returns matches (e1, e2). */
  def run(spark: SparkSession, kb1: DataFrame, kb2: DataFrame,
          cfg: IterConfig): DataFrame = {
    import spark.implicits._

    val values = UniqueMappingClustering.collectCandidates(
      valueScores(kb1, kb2), cfg.capPerEntity)
    val seeds: Seq[(Long, Long)] =
      if (cfg.seedFromNames)
        nameSeeds(kb1, kb2).collect().map(r => (r.getLong(0), r.getLong(1))).toSeq
      else Seq.empty

    val adj1 = adjacency(kb1)
    val adj2 = adjacency(kb2)
    // reverse adjacency: neighbor → (pred, source)
    def reverse(a: Map[Long, Seq[(String, Long)]]): Map[Long, Seq[(String, Long)]] =
      a.toSeq.flatMap { case (src, es) => es.map { case (p, n) => (n, (p, src)) } }
        .groupBy(_._1).map { case (k2, v) => k2 -> v.map(_._2) }
    val rev1 = reverse(adj1)
    val rev2 = reverse(adj2)

    val valueScore: Map[(Long, Long), Double] =
      values.map { case (a, b, s) => (a, b) -> s }.toMap

    val matched1 = mutable.Map.empty[Long, Long] // e1 -> e2
    val matched2 = mutable.Map.empty[Long, Long]
    val accepted = mutable.ArrayBuffer.empty[(Long, Long)]

    def graphScore(a: Long, b: Long): Double = {
      val na = adj1.getOrElse(a, Seq.empty)
      val nb = adj2.getOrElse(b, Seq.empty)
      if (na.isEmpty || nb.isEmpty) return 0.0
      var s = 0.0
      for ((p1, x) <- na; (p2, y) <- nb
           if matched1.get(x).contains(y)) s += cfg.relCompat(p1, p2)
      s / math.max(na.size, nb.size)
    }

    def score(a: Long, b: Long): Double =
      cfg.valueWeight * valueScore.getOrElse((a, b), 0.0) +
        (1 - cfg.valueWeight) * graphScore(a, b)

    // priority queue with lazy re-validation: entries carry the score at
    // insertion time; on pop, the score is recomputed and the entry
    // reinserted if it decayed (standard lazy-update trick — scores only
    // grow as matches accumulate, so a popped entry with a stale LOWER
    // score is reinserted with its fresh score).
    final case class Entry(score: Double, a: Long, b: Long)
    implicit val ord: Ordering[Entry] =
      Ordering.by((e: Entry) => (e.score, -e.a, -e.b))
    val pq = mutable.PriorityQueue.empty[Entry]

    def acceptPair(a: Long, b: Long): Unit = {
      matched1(a) = b; matched2(b) = a; accepted += ((a, b))
      // propagate to neighbor pairs via compatible relations
      val candidates = mutable.ArrayBuffer.empty[(Long, Long)]
      for ((p1, x) <- adj1.getOrElse(a, Seq.empty)
           if !matched1.contains(x);
           (p2, y) <- adj2.getOrElse(b, Seq.empty)
           if !matched2.contains(y) && cfg.relCompat(p1, p2) > 0)
        candidates += ((x, y))
      for ((p1, x) <- rev1.getOrElse(a, Seq.empty)
           if !matched1.contains(x);
           (p2, y) <- rev2.getOrElse(b, Seq.empty)
           if !matched2.contains(y) && cfg.relCompat(p1, p2) > 0)
        candidates += ((x, y))
      for ((x, y) <- candidates.distinct) {
        val s = score(x, y)
        if (s >= cfg.threshold) pq.enqueue(Entry(s, x, y))
      }
      // RiMOM-IM sibling completion: single unmatched neighbor pair left
      if (cfg.siblingCompletion) {
        for ((p1, _) <- adj1.getOrElse(a, Seq.empty)) {
          val p2s = adj2.getOrElse(b, Seq.empty).map(_._1).distinct
            .filter(p2 => cfg.relCompat(p1, p2) > 0)
          for (p2 <- p2s) {
            val left = adj1.getOrElse(a, Seq.empty).collect { case (`p1`, x) if !matched1.contains(x) => x }
            val right = adj2.getOrElse(b, Seq.empty).collect { case (`p2`, y) if !matched2.contains(y) => y }
            if (left.size == 1 && right.size == 1)
              pq.enqueue(Entry(1.0, left.head, right.head))
          }
        }
      }
    }

    for ((a, b) <- seeds if !matched1.contains(a) && !matched2.contains(b))
      acceptPair(a, b)
    for ((a, b, _) <- values) {
      val s = score(a, b)
      if (s >= cfg.threshold) pq.enqueue(Entry(s, a, b))
    }

    while (pq.nonEmpty && accepted.size < cfg.maxAccepted) {
      val e = pq.dequeue()
      if (!matched1.contains(e.a) && !matched2.contains(e.b)) {
        val fresh = score(e.a, e.b)
        if (fresh >= cfg.threshold) {
          if (fresh >= e.score - 1e-12) acceptPair(e.a, e.b)
          else pq.enqueue(Entry(fresh, e.a, e.b))
        }
      }
    }

    accepted.toSeq.toDF("e1", "e2")
  }
}
