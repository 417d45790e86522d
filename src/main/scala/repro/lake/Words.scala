package repro.lake

import scala.util.Random

/** Deterministic pseudo-word and surface-variant generation.
  *
  * Entities are rendered as syllable-based pseudo-words so that character
  * n-gram embedders ([[repro.embed.HashEmbedder]]) see realistic sub-word
  * structure: variants of the same entity share most n-grams, distinct
  * entities share few.
  */
object Words {

  private val Syllables: Array[String] = Array(
    "ba", "ri", "to", "ne", "la", "mo", "sa", "ke", "du", "vi",
    "pa", "zo", "mi", "ta", "re", "no", "ga", "fu", "se", "lo",
    "ki", "ra", "me", "bu", "han", "qua", "sta", "tri", "wel", "dor")

  /** Junk cells that appear across domains (missing-value markers etc.). */
  val NoiseCells: Vector[String] =
    Vector("n/a", "-", "unknown", "none", "0", "null", "tbd", "other")

  /** Vocabulary of cross-domain filler tokens used in table contexts. */
  private val JunkWords: Vector[String] = {
    val r = new Random(0x9e3779b97f4a7c15L)
    Vector.fill(200)(word(r))
  }

  /** Stable 64-bit mix of inputs, for per-object RNG seeding. */
  def mix(xs: Long*): Long = {
    var h = 0x9e3779b97f4a7c15L
    xs.foreach { x =>
      h ^= x + 0x9e3779b97f4a7c15L + (h << 6) + (h >>> 2)
      h *= 0xff51afd7ed558ccdL
      h ^= h >>> 33
    }
    h
  }

  /** One pseudo-word of 2–4 syllables. */
  def word(r: Random): String = {
    val n = 2 + r.nextInt(3)
    val sb = new StringBuilder
    var i = 0
    while (i < n) { sb.append(Syllables(r.nextInt(Syllables.length))); i += 1 }
    sb.toString
  }

  /** Canonical surface form of entity `idx` in domain `domain`. */
  def entityCanonical(cfg: LakeConfig, domain: Int, idx: Int): String = {
    val r = new Random(mix(cfg.seed, 0x517cc1b7L, domain.toLong, idx.toLong))
    val nWords = 1 + r.nextInt(2)
    val raw = (0 until nWords).map(_ => word(r)).mkString(" ")
    // Domain style: a third of domains title-case, a fifth add a numeric tag.
    val styled = if (domain % 3 == 0) raw.split(' ').map(_.capitalize).mkString(" ") else raw
    if (domain % 5 == 0) s"$styled ${100 + (idx % 900)}" else styled
  }

  /** Global latent entity id (used only for "expert" ground truth). */
  def entityId(domain: Int, idx: Int): Long = domain.toLong * 1000000L + idx

  /** Human-ish name of a domain (used for column names / titles). */
  def domainName(cfg: LakeConfig, domain: Int): String = {
    val r = new Random(mix(cfg.seed, 0x2545f491L, domain.toLong))
    word(r)
  }

  /** Title word shared by tables derived from the same anchor (provenance
    * signal — the reason table titles genuinely help joinable-table
    * discovery in the paper's ablation).
    */
  def anchorWord(cfg: LakeConfig, domain: Int, anchor: Int): String = {
    val r = new Random(mix(cfg.seed, 0x7a6c3L, domain.toLong, anchor.toLong))
    word(r)
  }

  /** A light variant: preserves most character n-grams (typo, casing). */
  private def lightVariant(s: String, r: Random): String = r.nextInt(3) match {
    case 0 if s.length >= 4 => // swap two adjacent chars
      val i = 1 + r.nextInt(s.length - 2)
      s.substring(0, i) + s.charAt(i + 1) + s.charAt(i) + s.substring(i + 2)
    case 1 if s.length >= 4 => // drop one char
      val i = 1 + r.nextInt(s.length - 2)
      s.substring(0, i) + s.substring(i + 1)
    case _ => s.toUpperCase
  }

  /** A heavy variant: abbreviation or suffix — far in n-gram space. */
  private def heavyVariant(s: String, r: Random): String = r.nextInt(3) match {
    case 0 => s.split(' ').map(w => w.take(math.min(3, w.length)) + ".").mkString(" ")
    case 1 => s + (if (r.nextBoolean()) " co" else " inc")
    case _ => s.split(' ').map(w => w.take(1)).mkString("").toUpperCase + "-" + s.length
  }

  /** Uniform [0,1) derived from a seed mix (for deterministic choices). */
  private def unit(h: Long): Double = ((h >>> 11).toDouble / (1L << 53)) match {
    case u if u < 0 => -u
    case u => u
  }

  /** Render a cell for an entity under a column rendering style.
    *
    * Style 0 is always the canonical form. For other styles the decision to
    * use a variant — and which variant — is deterministic in (entity,
    * style): every column in the same style renders the same string for the
    * same entity (so same-style columns equi-join on shared entities), while
    * different styles disagree on a `variantRate` fraction of entities (so
    * cross-style joins need the semantic definition).
    */
  def renderCell(cfg: LakeConfig, domain: Int, idx: Int, style: Int): String = {
    val canonical = entityCanonical(cfg, domain, idx)
    if (style == 0) return canonical
    val h = mix(cfg.seed, 0xe11aL, domain.toLong, idx.toLong, style.toLong)
    if (unit(h) >= cfg.variantRate) canonical
    else {
      val r = new Random(h)
      if (unit(mix(h, 0x42L)) < cfg.heavyVariantRate) heavyVariant(canonical, r)
      else lightVariant(canonical, r)
    }
  }

  /** Free-text context: a few domain words drowned in cross-domain junk. */
  def context(cfg: LakeConfig, domain: Int, r: Random): String = {
    val toks = (0 until cfg.contextTokens).map { _ =>
      if (r.nextDouble() < 0.35)
        entityCanonical(cfg, domain, r.nextInt(math.min(40, cfg.vocabPerDomain)))
      else JunkWords(r.nextInt(JunkWords.length))
    }
    toks.mkString(" ")
  }
}
