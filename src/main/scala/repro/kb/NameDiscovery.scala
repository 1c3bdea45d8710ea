package repro.kb

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Automatic discovery of name attributes (paper §2.2, “Entity Names”).
  *
  * From every KB we derive the *global* top-k literal attributes of highest
  * importance; their literal values act as the names of any entity carrying
  * them. Following [32] (as cited by the paper), the support of an
  * attribute here is subject-based — support(p) = |subjects(p)| / |E| —
  * and we combine it with value discriminability via the harmonic mean,
  * mirroring the relation-importance combination of §2.2.
  */
object NameDiscovery {

  /** Per-attribute statistics over the literal triples of one KB.
    * Output: (pred, subjects, instances, objects, support, discriminability,
    * importance).
    */
  def attributeScores(kb: DataFrame): DataFrame = {
    val nEntities = KBModel.entityCount(kb).toDouble
    val lit0 = KBModel.literals(kb).select("subj", "pred", "obj").distinct()
    lit0.groupBy("pred")
      .agg(countDistinct("subj") as "subjects",
           count(lit(1)) as "instances",
           countDistinct("obj") as "objects")
      .withColumn("support", col("subjects") / lit(nEntities))
      .withColumn("discriminability", col("objects") / col("instances"))
      .withColumn("importance",
        lit(2.0) * col("support") * col("discriminability") /
          (col("support") + col("discriminability")))
  }

  /** The k globally most important literal attributes of the KB
    * (deterministic tie-break on pred).
    */
  def nameAttributes(kb: DataFrame, k: Int): Seq[String] =
    attributeScores(kb)
      .orderBy(col("importance").desc, col("pred"))
      .limit(k)
      .select("pred").collect().map(_.getString(0)).toSeq

  /** `name(e)`: normalized literal values of the KB's top-k name attributes.
    * Output: (entity, name), distinct, empty names dropped. Normalization
    * (lowercase + strip non-alphanumerics) makes name blocking robust to
    * the surface-form noise of Web KBs while staying schema-agnostic.
    */
  def names(kb: DataFrame, k: Int): DataFrame = {
    val attrs = nameAttributes(kb, k)
    KBModel.literals(kb)
      .filter(col("pred").isin(attrs: _*))
      .select(col("subj") as "entity",
              Tokenizer.normalizeNameCol(col("obj")) as "name")
      .filter(length(col("name")) > 0)
      .distinct()
  }
}
