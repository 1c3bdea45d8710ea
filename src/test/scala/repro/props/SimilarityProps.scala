package repro.props

import org.scalacheck.{Gen, Prop, Properties}
import org.scalacheck.Prop.{forAll, propBoolean}

import repro.graph.ValueSimilarity
import repro.core.UniqueMappingClustering
import repro.baselines.IterativeMatcher
import repro.data.WebKBGen

/** ScalaCheck properties for the driver-side algorithmic kernels (no Spark
  * involved — the Spark formulations are checked against these reference
  * implementations and the DuckDB oracle in the per-module suites).
  */
object SimilarityProps extends Properties("similarity") {

  private val tokenGen: Gen[Set[String]] =
    Gen.containerOf[Set, String](Gen.oneOf("a", "b", "c", "d", "e", "f", "g"))

  private val kbGen: Gen[Map[Long, Set[String]]] =
    Gen.mapOf(Gen.zip(Gen.choose(0L, 20L), tokenGen)).map(_.filter(_._2.nonEmpty))

  property("valueSim is non-negative") =
    forAll(kbGen, kbGen) { (t1, t2) =>
      (t1.nonEmpty && t2.nonEmpty) ==> Prop {
        val e1 = t1.keys.head; val e2 = t2.keys.head
        ValueSimilarity.valueSimReference(t1, t2, e1, e2) >= 0.0
      }
    }

  property("valueSim is symmetric in the pair arguments") =
    forAll(kbGen, kbGen) { (t1, t2) =>
      (t1.nonEmpty && t2.nonEmpty) ==> Prop {
        val e1 = t1.keys.head; val e2 = t2.keys.head
        val a = ValueSimilarity.valueSimReference(t1, t2, e1, e2)
        // swapping the KBs swaps EF factors inside a product — same result
        val b = ValueSimilarity.valueSimReference(t2, t1, e2, e1)
        math.abs(a - b) < 1e-9
      }
    }

  property("valueSim self-similarity dominates (Proposition 1 triangle corollary)") =
    forAll(kbGen) { t1 =>
      t1.nonEmpty ==> Prop {
        val e1 = t1.keys.head
        val self = ValueSimilarity.valueSimReference(t1, t1, e1, e1)
        t1.keys.forall { other =>
          self + 1e-9 >= ValueSimilarity.valueSimReference(t1, t1, e1, other)
        }
      }
    }

  private val pairGen: Gen[Seq[(Long, Long, Double)]] =
    Gen.listOf(Gen.zip(Gen.choose(0L, 15L), Gen.choose(100L, 115L),
      Gen.choose(0.0, 1.0))).map(_.map { case (a, b, s) => (a, b, s) })

  property("UMC output is a partial 1-1 mapping") =
    forAll(pairGen, Gen.choose(0.0, 1.0)) { (pairs, t) =>
      val m = UniqueMappingClustering.cluster(pairs, t)
      m.map(_._1).distinct.size == m.size && m.map(_._2).distinct.size == m.size
    }

  property("UMC respects the threshold") =
    forAll(pairGen, Gen.choose(0.0, 1.0)) { (pairs, t) =>
      val best = pairs.groupBy(p => (p._1, p._2)).view.mapValues(_.map(_._3).max)
      val m = UniqueMappingClustering.cluster(pairs, t)
      m.forall(p => best(p) >= t)
    }

  property("UMC is monotone in the threshold (higher t ⇒ subset)") =
    forAll(pairGen, Gen.choose(0.0, 0.5)) { (pairs, t) =>
      val low = UniqueMappingClustering.cluster(pairs, t).toSet
      val high = UniqueMappingClustering.cluster(pairs, t + 0.4).toSet
      high.subsetOf(low)
    }

  property("editSimilarity is within [0,1] and symmetric") =
    forAll(Gen.alphaStr.map(_.take(12)), Gen.alphaStr.map(_.take(12))) { (a, b) =>
      val s = IterativeMatcher.editSimilarity(a, b)
      s >= 0.0 && s <= 1.0 && s == IterativeMatcher.editSimilarity(b, a)
    }

  property("generator hashing is deterministic") =
    forAll(Gen.choose(0L, 1L << 40), Gen.choose(0, 1000)) { (c, j) =>
      WebKBGen.h(42L, "t", c, j.toLong) == WebKBGen.h(42L, "t", c, j.toLong)
    }

  property("generator u01 lies in [0,1)") =
    forAll(Gen.choose(Long.MinValue, Long.MaxValue)) { x =>
      val u = WebKBGen.u01(x, "u")
      u >= 0.0 && u < 1.0
    }
}
