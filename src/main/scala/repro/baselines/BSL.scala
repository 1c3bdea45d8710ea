package repro.baselines

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

import repro.core.{Evaluation, Scores, UniqueMappingClustering}
import repro.kb.{KBModel, Tokenizer}
import repro.blocking.TokenBlocking

/** BSL — the paper's heavily fine-tuned value-only baseline (§6,
  * “Baselines”).
  *
  * It receives the *unpruned* blocking-graph candidate pairs and compares
  * every connected pair with a classic string-similarity pipeline:
  *
  *  - representation: token n-grams, n ∈ {1, 2, 3};
  *  - weighting: TF or TF-IDF;
  *  - similarity: Cosine, Jaccard, Generalized Jaccard, or SiGMa
  *    (the last applies only to TF-IDF, as in the paper) — all in [0, 1];
  *  - Unique Mapping Clustering with every threshold in [0, 1) step 0.05.
  *
  * Like the paper's BSL, the grid is tuned ON the ground truth and the best
  * F1 is reported — it is a skyline for value-only matching, not a fair
  * unsupervised competitor.
  */
object BSL {

  sealed trait Weighting { def name: String }
  case object TF extends Weighting { val name = "TF" }
  case object TFIDF extends Weighting { val name = "TF-IDF" }

  sealed trait Sim { def name: String }
  case object Cosine extends Sim { val name = "Cosine" }
  case object Jaccard extends Sim { val name = "Jaccard" }
  case object GenJaccard extends Sim { val name = "GenJaccard" }
  case object SigmaSim extends Sim { val name = "SiGMa" }

  final case class BslConfig(n: Int, weighting: Weighting, sim: Sim, threshold: Double) {
    def label: String = f"n=$n%d/${weighting.name}%s/${sim.name}%s/t=$threshold%.2f"
  }

  final case class BslResult(best: BslConfig, bestScores: Scores,
                             all: Seq[(BslConfig, Scores)])

  /** Token n-grams with term frequency per entity: (entity, gram, tf).
    * n-grams are formed within each literal value (no crossing values).
    */
  def ngrams(kb: DataFrame, n: Int): DataFrame = {
    val toks = KBModel.literals(kb)
      .select(col("subj") as "entity",
              split(lower(col("obj")), Tokenizer.TokenSplit) as "toks")
      .select(col("entity"), filter(col("toks"), t => length(t) > 0) as "toks")
    val grams =
      if (n == 1) toks.select(col("entity"), explode(col("toks")) as "gram")
      else {
        // sliding window of n consecutive tokens inside one value
        toks
          .filter(size(col("toks")) >= n)
          .select(col("entity"),
            explode(transform(sequence(lit(0), size(col("toks")) - n),
              i => concat_ws(" ", slice(col("toks"), i + 1, lit(n))))) as "gram")
      }
    grams.groupBy("entity", "gram").agg(count(lit(1)) as "tf")
  }

  /** Candidate pairs of the unpruned disjunctive blocking graph: every pair
    * co-occurring in a (purged) token block or sharing a name. Neighbor-only
    * pairs have zero value similarity and can never win UMC at a positive
    * threshold, so they are omitted (documented deviation).
    */
  def candidatePairs(et1: DataFrame, et2: DataFrame,
                     names1: DataFrame, names2: DataFrame): DataFrame = {
    val (blocks, _) = TokenBlocking.purgedSharedBlocks(et1, et2)
    val tokenPairs = et1.select(col("entity") as "e1", col("token"))
      .join(blocks.select("token"), "token")
      .join(et2.select(col("entity") as "e2", col("token")), "token")
      .select("e1", "e2")
    val sharedNames = names1.select(col("entity") as "e1", col("name"))
      .join(names2.select(col("entity") as "e2", col("name")), "name")
      .select("e1", "e2")
    tokenPairs.union(sharedNames).distinct()
  }

  /** All similarity columns for one (n, weighting) slice, restricted to the
    * candidate pairs. Output: (e1, e2, cosine, jaccard, genJaccard, sigma).
    */
  def pairSimilarities(
      grams1: DataFrame, grams2: DataFrame,
      pairs: DataFrame,
      weighting: Weighting): DataFrame = {

    def weighted(grams: DataFrame, other: DataFrame): DataFrame = weighting match {
      case TF =>
        // normalize TF by entity max to keep weights in [0,1]
        val m = grams.groupBy("entity").agg(max("tf") as "maxtf")
        grams.join(m, "entity").withColumn("w", col("tf") / col("maxtf"))
      case TFIDF =>
        val n1 = grams.select("entity").distinct().count()
        val n2 = other.select("entity").distinct().count()
        val total = (n1 + n2).toDouble
        val df = grams.select("entity", "gram").union(other.select("entity", "gram"))
          .groupBy("gram").agg(countDistinct("entity") as "df")
        // smoothed idf: strictly positive even for grams present everywhere
        grams.join(df, "gram")
          .withColumn("w", col("tf") * log(lit(1.0) + lit(total) / col("df")))
    }

    val w1 = weighted(grams1, grams2).select(col("entity") as "e1", col("gram"), col("w") as "w1")
    val w2 = weighted(grams2, grams1).select(col("entity") as "e2", col("gram"), col("w") as "w2")

    val stats1 = w1.groupBy("e1").agg(
      sum(col("w1") * col("w1")) as "sq1", sum("w1") as "sum1", count(lit(1)) as "n1")
    val stats2 = w2.groupBy("e2").agg(
      sum(col("w2") * col("w2")) as "sq2", sum("w2") as "sum2", count(lit(1)) as "n2")

    val shared = pairs
      .join(w1, "e1")
      .join(w2, Seq("e2", "gram"))
      .groupBy("e1", "e2")
      .agg(
        sum(col("w1") * col("w2")) as "dot",
        sum(least(col("w1"), col("w2"))) as "smin",
        sum(greatest(col("w1"), col("w2"))) as "smaxShared",
        sum(col("w1") + col("w2")) as "ssum",
        count(lit(1)) as "inter")

    // left-join back so pairs with no shared grams score 0
    pairs
      .join(shared, Seq("e1", "e2"), "left")
      .na.fill(0.0, Seq("dot", "smin", "smaxShared", "ssum"))
      .na.fill(0L, Seq("inter"))
      .join(stats1, "e1").join(stats2, "e2")
      .select(col("e1"), col("e2"),
        (col("dot") / (sqrt(col("sq1")) * sqrt(col("sq2")))) as "cosine",
        (col("inter") / (col("n1") + col("n2") - col("inter"))) as "jaccard",
        // Σ min over shared / (Σ max over union) — max over union =
        // Σ_e1 w + Σ_e2 w − (Σ_shared min + Σ_shared max) + Σ_shared max
        (col("smin") /
          (col("sum1") + col("sum2") - col("smin"))) as "genJaccard",
        (col("ssum") / (col("sum1") + col("sum2"))) as "sigma")
  }

  /** Full grid sweep; returns the best configuration by F1. */
  def run(spark: SparkSession,
          kb1: DataFrame, kb2: DataFrame,
          names1: DataFrame, names2: DataFrame,
          truth: DataFrame,
          ns: Seq[Int] = Seq(1, 2, 3),
          thresholds: Seq[Double] = (0 until 20).map(_ * 0.05),
          capPerEntity: Int = 50): BslResult = {

    val et1 = Tokenizer.entityTokens(kb1).cache()
    val et2 = Tokenizer.entityTokens(kb2).cache()
    val pairs = candidatePairs(et1, et2, names1, names2).cache()
    pairs.count()
    val tset = Evaluation.truthSet(truth)

    val results = Seq.newBuilder[(BslConfig, Scores)]
    for (n <- ns) {
      val g1 = ngrams(kb1, n).cache()
      val g2 = ngrams(kb2, n).cache()
      for (weighting <- Seq[Weighting](TF, TFIDF)) {
        val sims = pairSimilarities(g1, g2, pairs, weighting)
        val simCols: Seq[(Sim, String)] = weighting match {
          case TF => Seq(Cosine -> "cosine", Jaccard -> "jaccard", GenJaccard -> "genJaccard")
          case TFIDF => Seq(Cosine -> "cosine", Jaccard -> "jaccard",
                            GenJaccard -> "genJaccard", SigmaSim -> "sigma")
        }
        // one Spark collect per weighting slice (all sim columns at once);
        // the UMC sweep over thresholds runs driver-side.
        val collected = UniqueMappingClustering.collectCandidatesMulti(
          sims, simCols.map(_._2), capPerEntity)
        for (((sim, _), idx) <- simCols.zipWithIndex) {
          val scored = collected.map { case (a, b, ws) => (a, b, ws(idx)) }
          for (t <- thresholds) {
            val m = UniqueMappingClustering.cluster(scored, math.max(t, 1e-12))
            results += ((BslConfig(n, weighting, sim, t),
              Evaluation.scorePairsRestricted(m, tset)))
          }
        }
      }
      g1.unpersist(); g2.unpersist()
    }
    pairs.unpersist(); et1.unpersist(); et2.unpersist()

    val all = results.result()
    val (bestCfg, bestScores) = all.maxBy { case (c, s) => (s.f1, -c.threshold) }
    BslResult(bestCfg, bestScores, all)
  }
}
