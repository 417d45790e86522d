package repro.train

import repro.embed.{EmbeddingHead, VecOps}

/** A head the [[Trainer]] can optimize: forward with intermediates plus a
  * hand-derived backward pass accumulating parameter gradients.
  */
trait TrainableHead extends EmbeddingHead {
  /** (hidden activations or null, pre-normalization output, unit output). */
  def forward(x: Array[Float]): (Array[Float], Array[Float], Array[Float])

  /** Backprop dL/du (gradient w.r.t. the unit output) through the head;
    * accumulates parameter gradients into `grads` (same shapes as
    * [[parameters]]).
    */
  def backward(x: Array[Float],
               fwd: (Array[Float], Array[Float], Array[Float]),
               gradU: Array[Float], grads: Seq[Array[Float]]): Unit

  def parameters: Seq[Array[Float]]

  /** dL/de from dL/du through u = e/||e||: (g − (u·g)u) / ||e||. */
  protected final def normBackward(e: Array[Float], u: Array[Float],
                                   gradU: Array[Float]): Array[Float] = {
    val normE = math.max(VecOps.norm(e), 1e-6f)
    val uDotG = VecOps.dot(u, gradU)
    val out = new Array[Float](e.length)
    var i = 0
    while (i < e.length) { out(i) = (gradU(i) - uDotG * u(i)) / normE; i += 1 }
    out
  }
}

/** Per-dimension gain head: e(x) = normalize(x ⊙ exp(g)), g trainable.
  *
  * With only dIn parameters this is the right capacity for fine-tuning on a
  * few thousand positive pairs: it expresses exactly "feature re-weighting"
  * — amplifying the metadata segments and informative content buckets,
  * suppressing noise — and cannot memorize individual pairs the way a dense
  * projection can.
  */
final class DiagonalHead(val dIn: Int, seed: Long = 0xd1a6L) extends TrainableHead {
  override def dOut: Int = dIn
  val g: Array[Float] = new Array[Float](dIn) // gains are exp(g), init 1

  override def forward(x: Array[Float]): (Array[Float], Array[Float], Array[Float]) = {
    val e = new Array[Float](dIn)
    var i = 0
    while (i < dIn) { e(i) = x(i) * math.exp(g(i).toDouble).toFloat; i += 1 }
    val u = VecOps.copy(e)
    VecOps.normalizeInPlace(u)
    (null, e, u)
  }

  override def apply(x: Array[Float]): Array[Float] = forward(x)._3

  override def backward(x: Array[Float],
                        fwd: (Array[Float], Array[Float], Array[Float]),
                        gradU: Array[Float], grads: Seq[Array[Float]]): Unit = {
    val (_, e, u) = fwd
    val gE = normBackward(e, u, gradU)
    val gG = grads.head
    var i = 0
    while (i < dIn) { gG(i) += gE(i) * e(i); i += 1 } // de/dg = x·exp(g) = e
  }

  override def parameters: Seq[Array[Float]] = Seq(g)
}

/** The fine-tuned part of DeepJoin: a trainable two-layer projection applied
  * to the frozen PLM's pooled features, with a fixed truncation-residual so
  * that the untrained head already reproduces the base model and training
  * strictly refines it (a cheap stand-in for full-model fine-tuning, which
  * also starts from the pre-trained weights).
  *
  * e(x) = normalize( truncate(x, dOut) + W2 · tanh(W1 x + b1) + b2 )
  *
  * Parameters are flat row-major float arrays; [[Trainer]] owns the
  * gradients and Adam state.
  */
final class DenseHead(
    val dIn: Int,
    val dHidden: Int,
    val dOut: Int,
    seed: Long = 0x4eadL) extends TrainableHead {

  require(dOut <= dIn, "residual truncation requires dOut <= dIn")

  val w1: Array[Float] = init(dHidden * dIn, math.sqrt(1.0 / dIn), seed)
  val b1: Array[Float] = new Array[Float](dHidden)
  val w2: Array[Float] = init(dOut * dHidden, 0.05 * math.sqrt(1.0 / dHidden), seed + 1)
  val b2: Array[Float] = new Array[Float](dOut)

  private def init(n: Int, scale: Double, s: Long): Array[Float] = {
    val r = new java.util.Random(s)
    Array.fill(n)((r.nextGaussian() * scale).toFloat)
  }

  /** Forward pass returning intermediates for backprop:
    * (hidden activations, pre-normalization output, unit output).
    */
  def forward(x: Array[Float]): (Array[Float], Array[Float], Array[Float]) = {
    val h = new Array[Float](dHidden)
    var r = 0
    while (r < dHidden) {
      var s = b1(r)
      val off = r * dIn
      var c = 0
      while (c < dIn) { s += w1(off + c) * x(c); c += 1 }
      h(r) = math.tanh(s.toDouble).toFloat
      r += 1
    }
    val e = new Array[Float](dOut)
    r = 0
    while (r < dOut) {
      var s = b2(r) + x(r) // truncation residual
      val off = r * dHidden
      var c = 0
      while (c < dHidden) { s += w2(off + c) * h(c); c += 1 }
      e(r) = s
      r += 1
    }
    val u = VecOps.copy(e)
    VecOps.normalizeInPlace(u)
    (h, e, u)
  }

  override def apply(x: Array[Float]): Array[Float] = forward(x)._3

  override def backward(x: Array[Float],
                        fwd: (Array[Float], Array[Float], Array[Float]),
                        gradU: Array[Float], grads: Seq[Array[Float]]): Unit = {
    val (h, e, u) = fwd
    val Seq(gW1, gB1, gW2, gB2) = grads
    val gE = normBackward(e, u, gradU)

    // Through e = trunc(x) + W2 h + b2.
    val gH = new Array[Float](dHidden)
    var r = 0
    while (r < dOut) {
      val g = gE(r)
      if (g != 0.0f) {
        val off = r * dHidden
        var c = 0
        while (c < dHidden) {
          gW2(off + c) += g * h(c)
          gH(c) += w2(off + c) * g
          c += 1
        }
        gB2(r) += g
      }
      r += 1
    }

    // Through h = tanh(W1 x + b1).
    r = 0
    while (r < dHidden) {
      val g = gH(r) * (1.0f - h(r) * h(r))
      if (g != 0.0f) {
        val off = r * dIn
        var c = 0
        while (c < dIn) { gW1(off + c) += g * x(c); c += 1 }
        gB1(r) += g
      }
      r += 1
    }
  }

  override def parameters: Seq[Array[Float]] = Seq(w1, b1, w2, b2)
}
