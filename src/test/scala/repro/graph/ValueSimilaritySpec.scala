package repro.graph

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, TestKBs}
import repro.kb.{KBModel, Tokenizer}
import repro.blocking.TokenBlocking

class ValueSimilaritySpec extends SparkSpec {

  private lazy val kb1 = TestKBs.kb1(spark)
  private lazy val kb2 = TestKBs.kb2(spark)
  private lazy val et1 = Tokenizer.entityTokens(kb1)
  private lazy val et2 = Tokenizer.entityTokens(kb2)
  private lazy val blocks = TokenBlocking.sharedTokenBlocks(et1, et2)

  private def beta: Map[(Long, Long), Double] =
    ValueSimilarity.betaPairs(et1, et2, blocks).collect()
      .map(r => (r.getLong(0), r.getLong(1)) -> r.getDouble(2)).toMap

  private def tokensOf(kb: org.apache.spark.sql.DataFrame): Map[Long, Set[String]] =
    Tokenizer.entityTokens(kb).collect()
      .map(r => (r.getLong(0), r.getString(1)))
      .groupBy(_._1).map { case (k, v) => k -> v.map(_._2).toSet }

  test("a token unique to both KBs contributes exactly 1") {
    // EF1=EF2=1 ⇒ weight = 1/log2(2) = 1
    val w = ValueSimilarity.tokenWeight(lit(1L), lit(1L))
    val v = spark.range(1).select(w as "w").collect().head.getDouble(0)
    assert(math.abs(v - 1.0) < 1e-12)
  }

  test("weights decrease with token frequency") {
    val df = spark.range(1).select(
      ValueSimilarity.tokenWeight(lit(1L), lit(1L)) as "w1",
      ValueSimilarity.tokenWeight(lit(10L), lit(10L)) as "w2")
    val r = df.collect().head
    assert(r.getDouble(0) > r.getDouble(1))
  }

  test("betaPairs matches the driver-side Definition 2.1 reference") {
    val t1 = tokensOf(kb1); val t2 = tokensOf(kb2)
    val b = beta
    for (((e1, e2), v) <- b) {
      val ref = ValueSimilarity.valueSimReference(t1, t2, e1, e2)
      assert(math.abs(v - ref) < 1e-9, s"pair ($e1,$e2)")
    }
  }

  test("pairs without shared tokens are absent") {
    assert(!beta.contains((TestKBs.UK, TestKBs.JonnyLake)))
  }

  test("figure-1: Bray–Berkshire have high value similarity") {
    // shared tokens: bray, berkshire, england
    assert(beta((TestKBs.Bray, TestKBs.Berkshire)) > 1.0)
  }

  test("figure-1: chefs share the name tokens j/lake") {
    assert(beta.contains((TestKBs.JohnLakeA, TestKBs.JonnyLake)))
  }

  test("betaPairs is non-negative") {
    assert(beta.values.forall(_ > 0))
  }

  test("beta agrees with a DuckDB SQL formulation") {
    val weighted = blocks.select(col("token"),
      ValueSimilarity.tokenWeight(col("ef1"), col("ef2")) as "w")
    val b = ValueSimilarity.betaPairs(et1, et2, blocks)
      .selectExpr("e1", "e2", "cast(round(beta, 6) as string) as beta")
    Oracle.assertEquivalent(
      b,
      """SELECT t1.entity as e1, t2.entity as e2,
        |       cast(round(sum(cast(w.w as double)), 6) as varchar) as beta
        |FROM et1 t1 JOIN w ON t1.token = w.token
        |JOIN et2 t2 ON t2.token = w.token
        |GROUP BY t1.entity, t2.entity""".stripMargin,
      "et1" -> et1, "et2" -> et2, "w" -> weighted)
  }

  test("purged tokens do not contribute to beta") {
    import spark.implicits._
    // restrict blocks to a single token and verify only it contributes
    val only = blocks.filter("token = 'bray'")
    val b = ValueSimilarity.betaPairs(et1, et2, only).collect()
      .map(r => ((r.getLong(0), r.getLong(1)), r.getDouble(2))).toMap
    assert(b.keySet.forall { case (_, e2) => e2 === TestKBs.Berkshire })
  }

  test("valueSim grows with extra shared rare tokens (monotonicity)") {
    val t1 = Map(1L -> Set("a", "b"), 2L -> Set("a", "b", "c"))
    val t2 = Map(101L -> Set("a", "b", "c"))
    val s1 = ValueSimilarity.valueSimReference(t1, t2, 1L, 101L)
    val s2 = ValueSimilarity.valueSimReference(t1, t2, 2L, 101L)
    assert(s2 > s1)
  }
}
