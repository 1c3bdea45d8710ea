package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.graph.{BlockingGraph, DisjunctiveBlockingGraph}
import repro.kb.KBModel

/** The MinoanER non-iterative matching pipeline (paper §4, Algorithm 2).
  *
  * `M(e1, e2) = (R1 ∨ R2 ∨ R3) ∧ R4` over the pruned disjunctive blocking
  * graph; matches found by an earlier rule exclude their entities from the
  * later rules.
  */
object MinoanER {

  /** Rule selection for the Table-4 ablations. */
  final case class Variant(
      useR1: Boolean = true,
      useR2: Boolean = true,
      useR3: Boolean = true,
      useR4: Boolean = true,
      useNeighbors: Boolean = true)

  object Variant {
    val Full: Variant = Variant()
    val R1Only: Variant = Variant(useR2 = false, useR3 = false, useR4 = false)
    val R2Only: Variant = Variant(useR1 = false, useR3 = false, useR4 = false)
    val R3Only: Variant = Variant(useR1 = false, useR2 = false, useR4 = false)
    val NoR4: Variant = Variant(useR4 = false)
    /** Full workflow but R3 on value ranks only (all γ evidence dropped). */
    val NoNeighbors: Variant = Variant(useNeighbors = false)
  }

  /** Resolve two clean KBs end-to-end: build the graph, run the rules. */
  def resolve(kb1: DataFrame, kb2: DataFrame, cfg: MinoanERConfig = MinoanERConfig()): DataFrame =
    resolveVariant(kb1, kb2, cfg, Variant.Full)

  /** Resolve with an explicit rule selection (Table-4 ablations). */
  def resolveVariant(
      kb1: DataFrame, kb2: DataFrame,
      cfg: MinoanERConfig,
      variant: Variant): DataFrame = {
    val g = BlockingGraph.build(kb1, kb2, cfg).materialize()
    matchGraph(g, kb1, kb2, cfg, variant)
  }

  /** Run Algorithm 2 over a pre-built graph (shared across ablations). */
  def matchGraph(
      g: DisjunctiveBlockingGraph,
      kb1: DataFrame, kb2: DataFrame,
      cfg: MinoanERConfig,
      variant: Variant = Variant.Full): DataFrame = {
    val e1 = KBModel.entities(kb1).cache()
    val e2 = KBModel.entities(kb2)
    val smaller = if (e1.count() <= e2.count()) e1 else e2

    val empty = emptyMatches(kb1)
    var m: DataFrame = empty
    var matched: DataFrame = MatchingRules.matchedEntities(m)

    // each rule's output is materialized with truncated lineage: the match
    // set is tiny, while its plan (windows over the full graph) is deep —
    // mirrors the paper's broadcast of intermediate matches (§4.1)
    if (variant.useR1) {
      m = m.union(MatchingRules.r1(g)).distinct().localCheckpoint(true)
      matched = MatchingRules.matchedEntities(m).localCheckpoint(true)
    }
    if (variant.useR2) {
      m = m.union(MatchingRules.r2(g, smaller, e1, matched)).distinct().localCheckpoint(true)
      matched = MatchingRules.matchedEntities(m).localCheckpoint(true)
    }
    if (variant.useR3) {
      m = m.union(MatchingRules.r3(g, cfg.theta, e1, matched, variant.useNeighbors))
        .distinct().localCheckpoint(true)
    }
    if (variant.useR4) m = MatchingRules.r4(g, m)
    m.select("e1", "e2").distinct()
  }

  private def emptyMatches(kb1: DataFrame): DataFrame = {
    val spark = kb1.sparkSession
    import org.apache.spark.sql.types._
    spark.createDataFrame(spark.sparkContext.emptyRDD[org.apache.spark.sql.Row],
      StructType(Seq(StructField("e1", LongType), StructField("e2", LongType))))
  }
}
