package repro.kb

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Dataset statistics of Table 1 for a single KB.
  *
  * Conventions (matching the paper's extraction notes):
  *  - “attributes” counts distinct literal attributes;
  *  - “relations” counts distinct entity-valued attributes;
  *  - “types” counts distinct values of the rdf:type attribute
  *    (any pred whose local name ends in `type`);
  *  - “vocab.” counts distinct vocabulary prefixes of attribute names —
  *    our generator prefixes every pred with `v<i>:`.
  */
final case class KBStats(
    entities: Long,
    triples: Long,
    avgTokens: Double,
    attributes: Long,
    relations: Long,
    types: Long,
    vocabularies: Long)

object KBStatistics {

  /** The rdf:type-like attribute filter used for the “types” statistic. */
  private def isTypePred = col("pred").rlike("(?i)(^|[:#/])type$")

  def compute(kb: DataFrame): KBStats = {
    val entities = KBModel.entityCount(kb)
    val triples = kb.count()
    val avgTok = Tokenizer.averageTokens(Tokenizer.entityTokens(kb))
    val attributes = KBModel.literals(kb).select("pred").distinct().count()
    val relations = KBModel.relationTriples(kb).select("pred").distinct().count()
    val types = KBModel.literals(kb).filter(isTypePred)
      .select("obj").distinct().count()
    val vocabularies = kb
      .select(regexp_extract(col("pred"), "^([^:]+):", 1) as "vocab")
      .filter(length(col("vocab")) > 0)
      .distinct().count()
    KBStats(entities, triples, avgTok, attributes, relations, types, vocabularies)
  }
}
