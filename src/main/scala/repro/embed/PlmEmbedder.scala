package repro.embed

import repro.lake.LakeColumn
import repro.text.{Contextualizer, Tokenizer}

/** A projection applied on top of pooled PLM features (the "fine-tuned"
  * part of DeepJoin — see [[repro.train.DenseHead]]).
  */
trait EmbeddingHead extends Serializable {
  def dIn: Int
  def dOut: Int
  /** Unit-norm projected embedding. */
  def apply(x: Array[Float]): Array[Float]
}

/** Architecture of a simulated pre-trained language model.
  *
  * The encoder performs genuine transformer-shaped arithmetic — hashed token
  * (+ char-n-gram) embeddings, sinusoidal positional mixing, O(L²·d)
  * self-attention mixing layers and O(L·d²) feed-forward layers with fixed
  * seeded weights — so that (a) it is order-sensitive like a real PLM (the
  * cell-shuffle ablation depends on this), (b) attention concentrates on
  * high-frequency tokens, and (c) the efficiency benches measure a real
  * compute profile with the right asymptotics in L and d.
  *
  * "MPNet" is configured larger and with richer sub-word features than
  * "DistilBERT", which reproduces the paper's consistent quality ordering.
  */
final case class PlmConfig(
    name: String,
    dim: Int,
    charNgrams: Boolean,
    minNgram: Int,
    maxNgram: Int,
    posSensitivity: Double,
    attnLayers: Int,
    ffnLayers: Int,
    seed: Long) extends Serializable

object PlmEmbedder {
  /** Untrained relative weight of each metadata segment (cells dominate, as
    * they do in plain mean pooling over a mostly-cells token sequence).
    */
  final case class SegWeights(
      title: Float = 0.45f,
      colname: Float = 0.35f,
      stat: Float = 0.25f,
      context: Float = 0.35f) extends Serializable
}

object PlmConfig {
  val distilbert: PlmConfig = PlmConfig(
    "DistilBERT", dim = 256, charNgrams = true, minNgram = 3, maxNgram = 4,
    posSensitivity = 0.18, attnLayers = 1, ffnLayers = 1, seed = 0xd157L)

  val mpnet: PlmConfig = PlmConfig(
    "MPNet", dim = 384, charNgrams = true, minNgram = 2, maxNgram = 5,
    posSensitivity = 0.12, attnLayers = 1, ffnLayers = 1, seed = 0x3b9eL)

  /** BERT baseline: weaker sub-word features and stronger position
    * dependence — untuned BERT loses to fastText in the paper.
    */
  val bert: PlmConfig = PlmConfig(
    "BERT", dim = 256, charNgrams = true, minNgram = 3, maxNgram = 3,
    posSensitivity = 0.28, attnLayers = 1, ffnLayers = 1, seed = 0xbe27L)
}

/** The (simulated) PLM column encoder of Section 3.2.
  *
  * @param cfg       model architecture
  * @param ctx       column-to-text transformation to apply first
  * @param head      optional fine-tuned projection (None = raw PLM baseline)
  * @param parallel  when true, the per-token feed-forward and attention rows
  *                  run data-parallel across cores — the stand-in for the
  *                  paper's GPU-accelerated query encoding
  */
final class PlmEmbedder(
    val cfg: PlmConfig,
    val ctx: Contextualizer,
    val head: Option[EmbeddingHead] = None,
    val parallel: Boolean = false,
    val segWeights: PlmEmbedder.SegWeights = PlmEmbedder.SegWeights(),
    /** Weight cell contributions by inverse corpus frequency during pooling.
      * This models what the paper attributes to *fine-tuned* attention —
      * focusing on the cells more likely to discriminate a match — so it is
      * enabled for DeepJoin (fine-tuned) and off for raw PLM baselines,
      * whose pre-training has never seen the repository's statistics.
      */
    val idfPooling: Boolean = false) extends ColumnEmbedder {

  override def name: String =
    (if (head.isDefined) s"DeepJoin-${cfg.name}" else cfg.name) + s"/${ctx.option.name}"

  override def dim: Int = head.map(_.dOut).getOrElse(cfg.dim)

  // Field-segmented layout: title / colname / stat / context pool into
  // disjoint coordinate ranges, cells take the remainder. Real PLMs separate
  // fields via segment/position context that fine-tuning can exploit; with
  // pooled hashed features the only way a trained head can re-weight fields
  // is if they occupy disjoint coordinates.
  private val dMeta = cfg.dim / 10
  private val dStat = cfg.dim / 20
  private val titleOff = 0
  private val colnameOff = dMeta
  private val statOff = 2 * dMeta
  private val contextOff = 2 * dMeta + dStat
  private val cellOff = 2 * dMeta + 2 * dStat
  /** Dimensionality of the cell-content segment. */
  val dCell: Int = cfg.dim - cellOff

  private val cellEmb =
    new HashEmbedder(dCell, cfg.seed, useCharNgrams = cfg.charNgrams,
      minN = cfg.minNgram, maxN = math.max(cfg.minNgram, cfg.maxNgram))
  private val titleEmb = new HashEmbedder(dMeta, cfg.seed ^ 0x7171L, cfg.charNgrams)
  private val colnameEmb = new HashEmbedder(dMeta, cfg.seed ^ 0xc01L, cfg.charNgrams)
  private val statEmb = new HashEmbedder(dStat, cfg.seed ^ 0x57a7L, useCharNgrams = false)
  private val contextEmb = new HashEmbedder(dStat, cfg.seed ^ 0xc0deL, cfg.charNgrams)

  private def wTitle = segWeights.title
  private def wColname = segWeights.colname
  private def wStat = segWeights.stat
  private def wContext = segWeights.context

  // Fixed seeded feed-forward weights over the cell segment: a smooth
  // deterministic mixing map standing in for frozen pre-trained FFN blocks.
  @transient private lazy val ffnW: Array[Float] = {
    val r = new scala.util.Random(cfg.seed ^ 0xffeL)
    val scale = (1.0 / math.sqrt(dCell)).toFloat
    Array.fill(dCell * dCell)((r.nextGaussian() * scale).toFloat)
  }

  override def embed(col: LakeColumn): Array[Float] = {
    val pooled = baseFeatures(col)
    head match {
      case Some(h) => h(pooled)
      case None => pooled
    }
  }

  /** Pooled PLM features before any fine-tuned head (unit norm).
    * This is what the trainer caches per column.
    */
  def baseFeatures(col: LakeColumn): Array[Float] = {
    val r = ctx.render(col)
    val out = new Array[Float](cfg.dim)
    val cellVec = encodeCells(r.cells)
    System.arraycopy(cellVec, 0, out, cellOff, dCell)
    def put(text: Option[String], emb: HashEmbedder, off: Int, w: Float): Unit =
      text.foreach { t =>
        val v = emb.embedText(Tokenizer.tokenize(t))
        var i = 0
        while (i < v.length) { out(off + i) = w * v(i); i += 1 }
      }
    put(r.title, titleEmb, titleOff, wTitle)
    put(r.colname, colnameEmb, colnameOff, wColname)
    put(r.stat, statEmb, statOff, wStat)
    put(r.context, contextEmb, contextOff, wContext)
    VecOps.normalizeInPlace(out)
    out
  }

  /** Transformer-style encoding of the cell content (exposed for tests):
    * hashed token embeddings, positional mixing, self-attention and
    * feed-forward layers, mean pooling. Unit norm, length dCell.
    */
  def encodeCells(cells: Seq[String]): Array[Float] = {
    // Flatten to tokens, remembering each token's source cell for pooling.
    val toks = scala.collection.mutable.ArrayBuffer.empty[String]
    val wts = scala.collection.mutable.ArrayBuffer.empty[Float]
    val it = cells.iterator
    while (it.hasNext && toks.length < ctx.maxTokens) {
      val cell = it.next()
      val wIdf =
        if (!idfPooling) 1.0f
        else {
          // Inverse document frequency of the cell value over the target
          // repository: ubiquitous cells carry no discriminative signal.
          val df = ctx.frequency.getOrElse(cell, 1L)
          (1.0 / math.sqrt(1.0 + df)).toFloat
        }
      val ts = Tokenizer.tokenize(cell)
      // Cell-mean pooling: each *cell* carries the same total pooling mass
      // regardless of its token count — joinability (Eq. 1) counts cells,
      // not words, and the PLM's attention is simulated as having learned
      // the cell delimiters.
      if (ts.isEmpty) { toks += cell; wts += wIdf }
      else {
        val w = wIdf / ts.length
        ts.foreach { t => if (toks.length < ctx.maxTokens) { toks += t; wts += w } }
      }
    }
    if (toks.isEmpty) { toks += ""; wts += 1.0f }

    val L = toks.length
    var vecs = new Array[Array[Float]](L)
    var i = 0
    while (i < L) {
      val v = new Array[Float](dCell)
      cellEmb.embedTokenInto(toks(i), v)
      VecOps.normalizeInPlace(v)
      positionalMix(v, i)
      vecs(i) = v
      i += 1
    }

    var layer = 0
    while (layer < cfg.attnLayers) { vecs = attentionLayer(vecs); layer += 1 }
    layer = 0
    while (layer < cfg.ffnLayers) { ffnLayer(vecs); layer += 1 }

    // (Weighted) mean pooling + normalize, as sentence-transformers does.
    val out = new Array[Float](dCell)
    var wSum = 0.0f
    i = 0
    while (i < L) { wSum += wts(i); i += 1 }
    i = 0
    while (i < L) { VecOps.axpy(wts(i) / wSum, vecs(i), out); i += 1 }
    VecOps.normalizeInPlace(out)
    out
  }

  /** Positional mixing: a rotation whose angle grows with position, plus an
    * amplitude modulation whose phase depends on the *token* — the coupling
    * term is what survives mean pooling (a pure linear rotation of every
    * token almost cancels when the same multiset of tokens is pooled), so it
    * is what makes the encoder order-sensitive like a real PLM.
    * posSensitivity = 0 makes the encoder order-insensitive.
    */
  private def positionalMix(v: Array[Float], pos: Int): Unit = {
    if (cfg.posSensitivity == 0.0) return
    val theta = cfg.posSensitivity * (math.min(pos, 96) / 96.0) * (math.Pi / 3)
    val c = math.cos(theta).toFloat
    val s = math.sin(theta).toFloat
    val d = v.length
    // Token-dependent phase for the position-amplitude coupling.
    val phase = (v(0) * 37.0 + v(d / 2) * 17.0) * 10.0
    val amp = (1.0 + cfg.posSensitivity * 0.25 *
      math.sin(2.0 * math.Pi * pos / 7.0 + phase)).toFloat
    val shifted = new Array[Float](d)
    var i = 0
    while (i < d) { shifted(i) = v((i + 1) % d); i += 1 }
    i = 0
    while (i < d) { v(i) = amp * (c * v(i) + s * shifted(i)); i += 1 }
  }

  /** One softmax self-attention mixing layer with a residual. O(L²·d). */
  private def attentionLayer(vecs: Array[Array[Float]]): Array[Array[Float]] = {
    val L = vecs.length
    val d = dCell
    val invSqrtD = (2.0 / math.sqrt(d)).toFloat // sharpened scores
    val out = new Array[Array[Float]](L)
    val row = (i: Int) => {
      val scores = new Array[Float](L)
      var mx = Float.NegativeInfinity
      var j = 0
      while (j < L) {
        scores(j) = VecOps.dot(vecs(i), vecs(j)) * invSqrtD
        if (scores(j) > mx) mx = scores(j)
        j += 1
      }
      var z = 0.0f
      j = 0
      while (j < L) { scores(j) = math.exp((scores(j) - mx).toDouble).toFloat; z += scores(j); j += 1 }
      val o = new Array[Float](d)
      j = 0
      while (j < L) { VecOps.axpy(scores(j) / z * 0.5f, vecs(j), o); j += 1 }
      VecOps.axpy(0.5f, vecs(i), o)
      VecOps.normalizeInPlace(o)
      out(i) = o
    }
    if (parallel && L >= 16)
      java.util.stream.IntStream.range(0, L).parallel().forEach(i => row(i))
    else {
      var i = 0
      while (i < L) { row(i); i += 1 }
    }
    out
  }

  /** One fixed-weight feed-forward layer with tanh and residual. O(L·d²). */
  private def ffnLayer(vecs: Array[Array[Float]]): Unit = {
    val d = dCell
    val w = ffnW
    val tok = (i: Int) => {
      val v = vecs(i)
      val o = new Array[Float](d)
      var r = 0
      while (r < d) {
        var s = 0.0f
        val off = r * d
        var c = 0
        while (c < d) { s += w(off + c) * v(c); c += 1 }
        o(r) = v(r) + 0.15f * math.tanh(s.toDouble).toFloat
        r += 1
      }
      VecOps.normalizeInPlace(o)
      vecs(i) = o
    }
    if (parallel && vecs.length >= 8)
      java.util.stream.IntStream.range(0, vecs.length).parallel().forEach(i => tok(i))
    else {
      var i = 0
      while (i < vecs.length) { tok(i); i += 1 }
    }
  }
}
