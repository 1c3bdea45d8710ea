package repro.graph

import repro.{SparkSpec, TestKBs}
import repro.kb.RelationImportance

class NeighborSimilaritySpec extends SparkSpec {

  import spark.implicits._

  private def df3(rows: (Long, Long, Double)*) = rows.toSeq.toDF("e1", "e2", "beta")
  private def inn(rows: (Long, Long)*) = rows.toSeq.toDF("entity", "inNeighbor")

  test("gamma propagates beta to in-neighbor pairs") {
    val g = NeighborSimilarity.gammaPairs(
      df3((10L, 110L, 2.5)),
      inn(10L -> 1L),
      inn(110L -> 101L)).collect()
    assert(g.length === 1)
    val r = g.head
    assert((r.getLong(0), r.getLong(1)) === ((1L, 101L)))
    assert(math.abs(r.getDouble(2) - 2.5) < 1e-12)
  }

  test("gamma sums contributions from several neighbor edges (example 3.4)") {
    // β(Bray, Berkshire)=1.2 and β(JohnLakeA, JonnyLake)=0.4 both propagate
    // to (Restaurant1, Restaurant2): γ = 1.6 — the paper's Example 3.4.
    val g = NeighborSimilarity.gammaPairs(
      df3((3L, 103L, 1.2), (2L, 102L, 0.4)),
      inn(3L -> 1L, 2L -> 1L),
      inn(103L -> 101L, 102L -> 101L)).collect()
    assert(g.length === 1)
    assert(math.abs(g.head.getDouble(2) - 1.6) < 1e-12)
  }

  test("entities without in-neighbors produce no gamma") {
    val g = NeighborSimilarity.gammaPairs(
      df3((10L, 110L, 1.0)), inn(), inn(10L -> 1L))
    assert(g.count() === 0)
  }

  test("cross products of multiple in-neighbors are all credited") {
    val g = NeighborSimilarity.gammaPairs(
      df3((10L, 110L, 1.0)),
      inn(10L -> 1L, 10L -> 2L),
      inn(110L -> 101L)).collect()
      .map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(g === Set((1L, 101L), (2L, 101L)))
  }

  test("figure-1 end-to-end: restaurants obtain gamma via their top neighbors") {
    val kb1 = TestKBs.kb1(spark); val kb2 = TestKBs.kb2(spark)
    val et1 = repro.kb.Tokenizer.entityTokens(kb1)
    val et2 = repro.kb.Tokenizer.entityTokens(kb2)
    val blocks = repro.blocking.TokenBlocking.sharedTokenBlocks(et1, et2)
    val beta = ValueSimilarity.betaPairs(et1, et2, blocks)
    val g = NeighborSimilarity.gammaPairs(beta,
      RelationImportance.topInNeighbors(kb1, 3),
      RelationImportance.topInNeighbors(kb2, 3)).collect()
      .map(r => ((r.getLong(0), r.getLong(1)), r.getDouble(2))).toMap
    assert(g.contains((TestKBs.Restaurant1, TestKBs.Restaurant2)))
    assert(g((TestKBs.Restaurant1, TestKBs.Restaurant2)) > 0)
  }
}
