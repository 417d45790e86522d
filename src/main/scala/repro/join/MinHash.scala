package repro.join

/** MinHash sketches (Broder, 1997) — the substrate of LSH Ensemble.
  *
  * One 64-bit base hash per token; the `sig` signature slots are derived by
  * independent universal hashing of the base hash, so a signature costs
  * O(|X| · sig) to build and two signatures estimate Jaccard similarity as
  * the fraction of agreeing slots.
  */
final class MinHash(val sig: Int = 96, seed: Long = 0x1352af7L) extends Serializable {

  private val as: Array[Long] = {
    val r = new java.util.Random(seed)
    Array.fill(sig)(r.nextLong() | 1L)
  }
  private val bs: Array[Long] = {
    val r = new java.util.Random(seed ^ 0x5ca1ab1eL)
    Array.fill(sig)(r.nextLong())
  }

  private def baseHash(s: String): Long = {
    var h = 0xcbf29ce484222325L ^ seed
    var i = 0
    while (i < s.length) { h ^= s.charAt(i); h *= 0x100000001b3L; i += 1 }
    h
  }

  /** Signature of a set of cell values. */
  def signature(cells: Iterable[String]): Array[Long] = {
    val out = Array.fill(sig)(Long.MaxValue)
    cells.foreach { cell =>
      val h = baseHash(cell)
      var i = 0
      while (i < sig) {
        val v = as(i) * h + bs(i)
        if (v < out(i)) out(i) = v
        i += 1
      }
    }
    out
  }

  /** Jaccard estimate: fraction of agreeing signature slots. */
  def jaccard(a: Array[Long], b: Array[Long]): Double = {
    var agree = 0
    var i = 0
    while (i < sig) { if (a(i) == b(i)) agree += 1; i += 1 }
    agree.toDouble / sig
  }
}
