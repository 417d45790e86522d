package repro.lake

/** Configuration for a synthetic data-lake corpus.
  *
  * Two presets, [[LakeConfig.webtable]] and [[LakeConfig.wikitable]], play
  * the roles of the WDC Web Table Corpus 2015 and the Wikipedia table corpus
  * in the paper. They differ in vocabulary size, column-length distribution
  * and surface-variant rate, which is what drives the accuracy differences
  * the paper observes between the two corpora.
  *
  * @param name              corpus name, used in reports and seeds
  * @param nDomains          number of latent domains (a joinable "topic";
  *                          columns from the same domain share a vocabulary)
  * @param vocabPerDomain    number of distinct entities per domain
  * @param zipfAlpha         skew of the entity-frequency distribution inside
  *                          a domain (cells are Zipf-sampled by rank)
  * @param domainAlpha       skew of domain popularity across columns
  * @param minCells          minimum column size (paper drops columns < 5)
  * @param maxCells          cap on column size
  * @param sizeLogMean       mean of log column size (log-normal size model)
  * @param sizeLogStd        std of log column size
  * @param anchorsPerDomain  number of "anchor" entity subsets per domain;
  *                          columns drawn from the same anchor share
  *                          provenance and overlap heavily (the source of
  *                          high-joinability pairs, like tables derived from
  *                          a common upstream table in a real lake)
  * @param anchorRate        probability that a column is anchor-based
  * @param anchorSize        number of entities in an anchor subset
  * @param anchorFidelity    fraction of an anchored column's cells drawn
  *                          from the anchor (the rest are domain-wide)
  * @param nStyles           number of rendering styles; style 0 is always
  *                          canonical, other styles apply deterministic
  *                          per-entity surface variants — so two columns in
  *                          the same style string-match on shared entities,
  *                          while cross-style matches need semantic joins
  * @param variantRate       probability that a non-canonical style renders a
  *                          given entity as a variant (typo / abbreviation)
  * @param heavyVariantRate  fraction of variants that are "heavy" (abbreviations,
  *                          suffixes) — far in the cell-embedding space, the
  *                          cases a fixed PEXESO threshold misses
  * @param noiseCellRate     probability of inserting a cross-domain junk cell
  *                          ("n/a", "-", …) at each position
  * @param contextTokens     length of the free-text table context (mostly
  *                          noise tokens — the paper finds context hurts)
  * @param seed              master seed; all generation is deterministic in it
  */
final case class LakeConfig(
    name: String,
    nDomains: Int,
    vocabPerDomain: Int,
    zipfAlpha: Double,
    domainAlpha: Double,
    minCells: Int,
    maxCells: Int,
    sizeLogMean: Double,
    sizeLogStd: Double,
    anchorsPerDomain: Int,
    anchorRate: Double,
    anchorSize: Int,
    anchorFidelity: Double,
    nStyles: Int,
    variantRate: Double,
    heavyVariantRate: Double,
    noiseCellRate: Double,
    contextTokens: Int,
    seed: Long)

object LakeConfig {

  /** Webtable-like corpus: many short key columns, moderate variants. */
  def webtable(seed: Long = 7L): LakeConfig = LakeConfig(
    name = "webtable",
    nDomains = 32,
    vocabPerDomain = 400,
    zipfAlpha = 1.05,
    domainAlpha = 0.5,
    minCells = 5,
    maxCells = 500,
    sizeLogMean = math.log(15.0),
    sizeLogStd = 0.85,
    anchorsPerDomain = 6,
    anchorRate = 0.65,
    anchorSize = 45,
    anchorFidelity = 0.9,
    nStyles = 4,
    variantRate = 0.22,
    heavyVariantRate = 0.35,
    noiseCellRate = 0.03,
    contextTokens = 12,
    seed = seed)

  /** Wikitable-like corpus: cleaner vocabulary but higher format discrepancy. */
  def wikitable(seed: Long = 11L): LakeConfig = LakeConfig(
    name = "wikitable",
    nDomains = 24,
    vocabPerDomain = 600,
    zipfAlpha = 0.95,
    domainAlpha = 0.4,
    minCells = 5,
    maxCells = 300,
    sizeLogMean = math.log(14.0),
    sizeLogStd = 0.75,
    anchorsPerDomain = 8,
    anchorRate = 0.6,
    anchorSize = 40,
    anchorFidelity = 0.85,
    nStyles = 5,
    variantRate = 0.32,
    heavyVariantRate = 0.45,
    noiseCellRate = 0.02,
    contextTokens = 14,
    seed = seed)
}
