package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Deterministic, distributed generator of synthetic Web-KB pairs with
  * ground truth (the data substitution for the paper's four real KB pairs —
  * DESIGN.md §2).
  *
  * Every random decision is a pure function of (profile.seed, keys...) via
  * a splitmix64 hash, so the output is byte-identical across runs, executor
  * counts and partitionings. Entity ids: KB1 uses [0, n1), KB2 uses
  * [Off2, Off2 + n2); ground truth matches id ↔ Off2 + id for id < nMatches.
  */
object WebKBGen {

  val Off2 = 1000000000L

  /** One generated triple; objId non-null marks a relation edge. */
  final case class GenTriple(subj: Long, pred: String, obj: String, objId: Option[Long])

  /** Generator output: the two KBs, the truth, and the metadata that
    * models domain-expert input for the baselines (true relation alignment
    * for SiGMa-lite / RiMOM-lite).
    */
  final case class Generated(
      kb1: DataFrame,
      kb2: DataFrame,
      truth: DataFrame,
      relAlignment: Map[String, String],
      nameAttrs1: Seq[String],
      nameAttrs2: Seq[String])

  // ---------------------------------------------------------------- hashing

  /** splitmix64 finalizer — the per-decision PRNG. */
  private def mix(z0: Long): Long = {
    var z = z0 + 0x9E3779B97F4A7C15L
    z = (z ^ (z >>> 30)) * 0xBF58476D1CE4E5B9L
    z = (z ^ (z >>> 27)) * 0x94D049BB133111EBL
    z ^ (z >>> 31)
  }

  def h(seed: Long, tag: String, parts: Long*): Long =
    parts.foldLeft(mix(seed ^ tag.hashCode.toLong))((acc, p) => mix(acc ^ p))

  def u01(seed: Long, tag: String, parts: Long*): Double =
    (h(seed, tag, parts: _*) >>> 11) * (1.0 / (1L << 53))

  def coin(p: Double, seed: Long, tag: String, parts: Long*): Boolean =
    u01(seed, tag, parts: _*) < p

  def pick(n: Int, seed: Long, tag: String, parts: Long*): Int =
    ((h(seed, tag, parts: _*) >>> 1) % math.max(1, n)).toInt

  // ------------------------------------------------------------ vocabulary

  private def chunkTokens(p: KBProfile, concept: Long, j: Int): Seq[String] =
    if (coin(p.pCategoricalChunk, p.seed, "catc", concept, j.toLong))
      // stock phrase shared across concepts — repeats lower the hosting
      // attribute's discriminability and add realistic frequent tokens
      (0 until p.tokensPerChunk).map(t =>
        "c" + pick(p.categoricalPool, p.seed, "cat", concept, j.toLong, t.toLong))
    else
      (0 until p.tokensPerChunk).map { t =>
        if (coin(p.pFreqToken, p.seed, "ft", concept, j.toLong, t.toLong))
          "f" + pick(p.freqPool, p.seed, "fp", concept, j.toLong, t.toLong)
        else
          "q" + pick(p.sharedVocab, p.seed, "rp", concept, j.toLong, t.toLong)
      }

  private def chunkString(tokens: Seq[String]): String = tokens.mkString(" ")

  /** Decoration: same token sequence, different surface string (case and
    * separators only) — breaks exact-equality matchers (PARIS-style seed
    * evidence), survives both tokenization and name normalization
    * (lowercase + strip non-alphanumerics preserves token order).
    */
  private def decorate(tokens: Seq[String]): String =
    tokens.map(_.toUpperCase).mkString("-") + "."

  private def nameString(p: KBProfile, concept: Long): String = p.nameStyle match {
    case NameStyle.Distinct =>
      s"u${concept}a u${concept}b"
    case NameStyle.CommonTokens(pf, pl, pm) =>
      val f = "nf" + pick(pf, p.seed, "nmf", concept)
      val l = "nl" + pick(pl, p.seed, "nml", concept)
      val m = "nm" + pick(pm, p.seed, "nmm", concept)
      s"$f $l $m"
  }

  /** Names of entities with no shared name: same style, keyed per side. */
  private def localName(p: KBProfile, side: Int, i: Long): String =
    nameString(p, h(p.seed, "locn", side.toLong, i))

  // ------------------------------------------------------------ schema

  private def vocabPrefix(p: KBProfile, side: Int, idx: Int): String = {
    val v = idx % (if (side == 1) p.vocab1 else p.vocab2)
    s"v$v:"
  }

  def nameAttr(p: KBProfile, side: Int, secondary: Boolean): String =
    vocabPrefix(p, side, 0) + (if (secondary) s"title$side" else s"label$side")

  private def contentAttr(p: KBProfile, side: Int, idx: Int): String =
    vocabPrefix(p, side, idx + 1) + s"a${side}_$idx"

  private def typeAttr(p: KBProfile, side: Int): String =
    vocabPrefix(p, side, 0) + "type"

  def relName(p: KBProfile, side: Int, idx: Int): String = {
    val aligned = idx < p.importantRels
    (p.relNameStyle, aligned) match {
      case (RelNameStyle.Similar, true) =>
        if (side == 1) vocabPrefix(p, side, idx) + s"p${idx}_rel"
        else vocabPrefix(p, side, idx) + s"p${idx}_relation"
      case _ =>
        vocabPrefix(p, side, idx) + s"r${side}_$idx"
    }
  }

  /** True alignment of the important relations (SiGMa-lite / RiMOM-lite
    * input — models the domain-expert relation alignment those systems
    * assume).
    */
  def relAlignment(p: KBProfile): Map[String, String] =
    (0 until p.importantRels).map(i => relName(p, 1, i) -> relName(p, 2, i)).toMap

  // ------------------------------------------------------------ entities

  private def conceptOf(p: KBProfile, side: Int, i: Long): Long =
    if (i < p.nMatches) i else (side.toLong << 40) | i

  /** Per-concept chunk-sharing probability, spread around the profile mean
    * so the value similarity of matches scatters as in the paper's Fig. 2.
    */
  private def pShare(p: KBProfile, concept: Long): Double = {
    val d = p.pChunkShared + (u01(p.seed, "spr", concept) * 2 - 1) * p.chunkSharedSpread
    math.max(0.05, math.min(1.0, d))
  }

  /** All triples of one entity. `side` ∈ {1, 2}, `i` the side-local index. */
  def entityTriples(p: KBProfile, side: Int, i: Long): Seq[GenTriple] = {
    val id = if (side == 1) i else Off2 + i
    val matched = i < p.nMatches
    val c = conceptOf(p, side, i)
    val out = Seq.newBuilder[GenTriple]
    val nSide = if (side == 1) p.n1 else p.n2
    val nAttrs = if (side == 1) p.attrs1 else p.attrs2

    // ---- identity chunks ----
    val chunkIdx = 0 until p.coreChunks
    val keptChunks: Seq[Int] =
      if (side == 1 || !matched) chunkIdx
      else chunkIdx.filter(j => coin(pShare(p, c), p.seed, "keep", c, j.toLong))
    for (j <- keptChunks) {
      val toks = chunkTokens(p, c, j)
      val str =
        if (side == 2 && matched && coin(p.pValueNoise, p.seed, "dec", c, j.toLong))
          decorate(toks)
        else chunkString(toks)
      val attr = contentAttr(p, side, pick(nAttrs, p.seed, "cattr", id, j.toLong))
      out += GenTriple(id, attr, str, None)
    }

    // ---- interference: unmatched entity re-chunks a matched concept's tokens ----
    if (!matched && p.nMatches > 0 && coin(p.pInterfere, p.seed, "intf", side.toLong, i)) {
      val victim = pick(p.nMatches, p.seed, "vict", side.toLong, i).toLong
      val toks = (0 until p.interfereChunks).flatMap { j =>
        chunkTokens(p, victim, pick(p.coreChunks, p.seed, "ichk", side.toLong, i, j.toLong))
      }
      // re-chunk in pairs with a shifted boundary — token collisions without
      // exact string collisions
      val regrouped = (toks.drop(1) ++ toks.take(1)).grouped(2).map(_.mkString(" "))
      for ((v, j) <- regrouped.zipWithIndex) {
        val attr = contentAttr(p, side, pick(nAttrs, p.seed, "iattr", id, j.toLong))
        out += GenTriple(id, attr, v, None)
      }
    }

    // ---- side-specific noise chunks ----
    val nNoise = if (side == 1) p.noiseChunks1 else p.noiseChunks2
    for (j <- 0 until nNoise) {
      val toks = (0 until p.tokensPerChunk).map { t =>
        if (coin(p.pNoiseCollide, p.seed, "nc", side.toLong, i, j.toLong, t.toLong))
          "q" + pick(p.sharedVocab, p.seed, "nq", side.toLong, i, j.toLong, t.toLong)
        else
          s"z$side" + pick(p.noiseVocab, p.seed, "nz", side.toLong, i, j.toLong, t.toLong)
      }
      val attr = contentAttr(p, side, pick(nAttrs, p.seed, "nattr", id, j.toLong))
      out += GenTriple(id, attr, chunkString(toks), None)
    }

    // ---- name ----
    val shared = matched && coin(p.pNameShared, p.seed, "nmshare", c)
    val hasName = shared || coin(p.pHasName, p.seed, "hasnm", side.toLong, i)
    if (hasName) {
      val base = if (shared) nameString(p, c) else localName(p, side, i)
      val value =
        if (side == 2 && shared && coin(p.pNameDecor2, p.seed, "nmdec", c))
          decorate(base.split(" ").toSeq)
        else base
      // the primary label always carries the name (keeps its support — and
      // thus its name-discovery rank — above every content attribute); the
      // secondary title repeats it for a fraction of entities
      out += GenTriple(id, nameAttr(p, side, secondary = false), value, None)
      if (coin(p.pSecondaryNameAttr, p.seed, "nmattr", side.toLong, i))
        out += GenTriple(id, nameAttr(p, side, secondary = true), value, None)
    }

    // ---- type ----
    val nTypes = if (side == 1) p.types1 else p.types2
    out += GenTriple(id, typeAttr(p, side), s"ty${side}v" + pick(nTypes, p.seed, "ty", side.toLong, i), None)

    // ---- important relations ----
    val deg = math.min(p.relDegree, p.importantRels)
    for (r <- 0 until deg) {
      val target: Long =
        if (matched && p.nMatches > 1 && coin(p.pNeighborMatch, p.seed, "agree", c, r.toLong)) {
          // both sides point at the two halves of the SAME target pair
          val step = 1 + pick(p.nMatches - 1, p.seed, "step", c, r.toLong)
          val tc = (i + step) % p.nMatches
          if (side == 1) tc else Off2 + tc
        } else {
          val t = pick(nSide, p.seed, "rtgt", side.toLong, i, r.toLong).toLong
          if (side == 1) t else Off2 + t
        }
      if (target != id)
        out += GenTriple(id, relName(p, side, r), s"ref:$target", Some(target))
    }

    // ---- junk relations (hub targets — low discriminability) ----
    val nRels = if (side == 1) p.rels1 else p.rels2
    if (nRels > p.importantRels) {
      for (r <- 0 until p.junkDegree) {
        val relIdx = p.importantRels +
          pick(nRels - p.importantRels, p.seed, "jrel", side.toLong, i, r.toLong)
        val hub = pick(p.hubCount, p.seed, "hub", side.toLong, i, r.toLong).toLong
        val target = if (side == 1) hub else Off2 + hub
        if (target != id)
          out += GenTriple(id, relName(p, side, relIdx), s"ref:$target", Some(target))
      }
    }

    out.result()
  }

  // ------------------------------------------------------------ assembly

  /** Generate the full KB pair for a profile. */
  def generate(spark: SparkSession, p: KBProfile): Generated = {
    import spark.implicits._

    def kbFrame(side: Int, n: Int): DataFrame =
      spark.range(n.toLong)
        .as[Long]
        .mapPartitions(_.flatMap(i => entityTriples(p, side, i)))
        .toDF()
        .select(col("subj"), col("pred"), col("obj"), col("objId"))

    val kb1 = kbFrame(1, p.n1)
    val kb2 = kbFrame(2, p.n2)
    val truth = spark.range(p.nMatches.toLong)
      .select(col("id") as "id1", (col("id") + Off2) as "id2")

    Generated(kb1, kb2, truth, relAlignment(p),
      nameAttrs1 = Seq(nameAttr(p, 1, secondary = false), nameAttr(p, 1, secondary = true)),
      nameAttrs2 = Seq(nameAttr(p, 2, secondary = false), nameAttr(p, 2, secondary = true)))
  }
}
