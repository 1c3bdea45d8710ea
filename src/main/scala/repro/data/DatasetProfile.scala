package repro.data

/** How entity names are built by the generator. */
sealed trait NameStyle
object NameStyle {
  /** Names made of concept-unique tokens (strong token evidence). */
  case object Distinct extends NameStyle
  /** Names drawn from small first/last/middle token pools — full strings are
    * (almost always) unique, individual tokens are frequent. Models the
    * YAGO-IMDb / BBCmusic name token distributions.
    */
  final case class CommonTokens(poolF: Int, poolL: Int, poolM: Int) extends NameStyle
}

/** Surface similarity of relation names across the two KBs (LINDA-lite
  * aligns relations by name similarity; SiGMa-lite receives the true
  * alignment as input).
  */
sealed trait RelNameStyle
object RelNameStyle {
  case object Similar extends RelNameStyle
  case object Dissimilar extends RelNameStyle
}

/** Generator profile for one synthetic KB pair (see DESIGN.md §2).
  *
  * A profile controls every resolution-relevant characteristic of the
  * benchmark it stands in for: KB sizes, match count, the value-similarity
  * distribution of matches, surface-form noise, schema heterogeneity,
  * name sharing, token-sharing interference from unmatched entities, and
  * the entity-graph structure feeding neighbor evidence.
  */
final case class KBProfile(
    name: String,
    n1: Int, n2: Int, nMatches: Int,
    // --- literal content ---
    coreChunks: Int,          // identity chunks per concept
    tokensPerChunk: Int,
    pChunkShared: Double,     // mean prob. that KB2 keeps a chunk
    chunkSharedSpread: Double,// per-concept spread around the mean (Fig. 2 scatter)
    pValueNoise: Double,      // prob. KB2 decorates a kept chunk (same tokens, different string)
    pFreqToken: Double,       // prob. a chunk token comes from the frequent pool
    freqPool: Int,            // frequent-token pool size (years, genres, stock words)
    sharedVocab: Int,         // semi-rare token vocabulary shared by both KBs
    pCategoricalChunk: Double,// prob. a chunk is a stock phrase (lowers attr discriminability)
    categoricalPool: Int,
    noiseChunks1: Int, noiseChunks2: Int, // side-specific extra chunks per entity
    pNoiseCollide: Double,    // prob. a noise token comes from sharedVocab (else side-local vocab)
    noiseVocab: Int,
    // --- names ---
    pHasName: Double,
    pNameShared: Double,      // matches sharing a normalized-identical name
    nameStyle: NameStyle,
    pNameDecor2: Double,      // KB2 surface decoration of shared names (breaks exact equality)
    pSecondaryNameAttr: Double, // prob. the name sits under the secondary name attribute
    // --- interference ---
    pInterfere: Double,       // unmatched entity copies (re-chunked) tokens of a random concept
    interfereChunks: Int,
    // --- schema ---
    attrs1: Int, attrs2: Int, // non-name literal attribute pool sizes
    rels1: Int, rels2: Int,   // relation pool sizes (importantRels of them aligned)
    importantRels: Int,
    relNameStyle: RelNameStyle,
    relDegree: Int,           // important-relation out-degree per entity
    junkDegree: Int,          // junk-relation out-degree per entity
    pNeighborMatch: Double,   // prob. an important relation agrees across KBs
    hubCount: Int,            // junk-relation target hubs (low discriminability)
    types1: Int, types2: Int,
    vocab1: Int, vocab2: Int, // vocabulary-prefix counts for Table 1
    seed: Long) {
  require(nMatches <= math.min(n1, n2), "matches must fit in both KBs")
  require(importantRels <= math.min(rels1, rels2))
}

/** The four dataset analogues (see DESIGN.md §2 for the mapping rationale)
  * plus the paper's reference numbers for Tables 1–4.
  */
object DatasetProfile {

  /** Strongly similar matches, tiny KBs, low heterogeneity. */
  val restaurantLite: KBProfile = KBProfile(
    name = "restaurant-lite",
    n1 = 339, n2 = 2256, nMatches = 89,
    coreChunks = 7, tokensPerChunk = 2,
    pChunkShared = 0.92, chunkSharedSpread = 0.08,
    pValueNoise = 0.05,
    pFreqToken = 0.15, freqPool = 30,
    sharedVocab = 200000,
    pCategoricalChunk = 0.15, categoricalPool = 40,
    noiseChunks1 = 2, noiseChunks2 = 2, pNoiseCollide = 0.1, noiseVocab = 5000,
    pHasName = 0.95, pNameShared = 0.69, nameStyle = NameStyle.Distinct,
    pNameDecor2 = 0.0, pSecondaryNameAttr = 0.25,
    pInterfere = 0.05, interfereChunks = 2,
    attrs1 = 5, attrs2 = 5, rels1 = 2, rels2 = 2, importantRels = 2,
    relNameStyle = RelNameStyle.Similar,
    relDegree = 2, junkDegree = 0, pNeighborMatch = 0.8, hubCount = 5,
    types1 = 3, types2 = 3, vocab1 = 2, vocab2 = 2,
    seed = 41)

  /** Strong value similarity, heavily imbalanced KB sizes. Token EFs are
    * sized (sharedVocab=4000 against 32.5K entities) so that a match's top
    * β sits just around 1 — R2 catches only the strongest third, as in the
    * real Rexa–DBLP where title/author tokens are frequent across 2.6M
    * publications.
    */
  val rexaDblpLite: KBProfile = KBProfile(
    name = "rexa-dblp-lite",
    n1 = 2500, n2 = 30000, nMatches = 1300,
    coreChunks = 6, tokensPerChunk = 2,
    pChunkShared = 0.8, chunkSharedSpread = 0.2,
    pValueNoise = 0.10,
    pFreqToken = 0.15, freqPool = 100,
    sharedVocab = 3000,
    pCategoricalChunk = 0.15, categoricalPool = 60,
    noiseChunks1 = 3, noiseChunks2 = 14, pNoiseCollide = 0.2, noiseVocab = 50000,
    pHasName = 0.95, pNameShared = 0.88,
    nameStyle = NameStyle.CommonTokens(poolF = 300, poolL = 800, poolM = 500),
    pNameDecor2 = 0.0, pSecondaryNameAttr = 0.25,
    pInterfere = 0.10, interfereChunks = 2,
    attrs1 = 20, attrs2 = 25, rels1 = 4, rels2 = 6, importantRels = 3,
    relNameStyle = RelNameStyle.Similar,
    relDegree = 3, junkDegree = 1, pNeighborMatch = 0.75, hubCount = 10,
    types1 = 4, types2 = 11, vocab1 = 4, vocab2 = 4,
    seed = 42)

  /** Extreme schema heterogeneity + token-set imbalance + surface noise. */
  val bbcmusicDbpediaLite: KBProfile = KBProfile(
    name = "bbcmusic-dbpedia-lite",
    n1 = 4000, n2 = 12000, nMatches = 1800,
    coreChunks = 6, tokensPerChunk = 2,
    pChunkShared = 0.55, chunkSharedSpread = 0.30,
    pValueNoise = 0.85,
    pFreqToken = 0.25, freqPool = 150,
    sharedVocab = 15000,
    pCategoricalChunk = 0.2, categoricalPool = 80,
    noiseChunks1 = 3, noiseChunks2 = 30, pNoiseCollide = 0.5, noiseVocab = 25000,
    pHasName = 0.92, pNameShared = 0.66,
    nameStyle = NameStyle.CommonTokens(poolF = 250, poolL = 600, poolM = 400),
    pNameDecor2 = 0.9, pSecondaryNameAttr = 0.3,
    pInterfere = 0.15, interfereChunks = 2,
    attrs1 = 15, attrs2 = 300, rels1 = 5, rels2 = 40, importantRels = 3,
    relNameStyle = RelNameStyle.Dissimilar,
    relDegree = 3, junkDegree = 2, pNeighborMatch = 0.8, hubCount = 15,
    types1 = 4, types2 = 500, vocab1 = 4, vocab2 = 6,
    seed = 43)

  /** Low value similarity, tiny match fraction, heavy token interference,
    * exact shared literals + aligned functional relations (PARIS's sweet
    * spot, BSL's nightmare).
    */
  val yagoImdbLite: KBProfile = KBProfile(
    name = "yago-imdb-lite",
    n1 = 15000, n2 = 15000, nMatches = 1500,
    coreChunks = 3, tokensPerChunk = 2,
    pChunkShared = 0.75, chunkSharedSpread = 0.25,
    pValueNoise = 0.0,
    pFreqToken = 0.4, freqPool = 80,
    sharedVocab = 150000,
    pCategoricalChunk = 0.25, categoricalPool = 50,
    noiseChunks1 = 1, noiseChunks2 = 1, pNoiseCollide = 0.6, noiseVocab = 8000,
    pHasName = 0.92, pNameShared = 0.67,
    nameStyle = NameStyle.CommonTokens(poolF = 400, poolL = 1200, poolM = 2000),
    pNameDecor2 = 0.0, pSecondaryNameAttr = 0.2,
    pInterfere = 0.6, interfereChunks = 2,
    attrs1 = 12, attrs2 = 10, rels1 = 4, rels2 = 5, importantRels = 3,
    relNameStyle = RelNameStyle.Similar,
    relDegree = 3, junkDegree = 2, pNeighborMatch = 0.85, hubCount = 20,
    types1 = 30, types2 = 15, vocab1 = 3, vocab2 = 1,
    seed = 44)

  val all: Seq[KBProfile] =
    Seq(restaurantLite, rexaDblpLite, bbcmusicDbpediaLite, yagoImdbLite)

  def byName(n: String): KBProfile =
    all.find(_.name == n).getOrElse(sys.error(s"unknown profile: $n"))
}
