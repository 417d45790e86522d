package repro.ann

import repro.embed.VecOps

/** Exact kNN by linear scan — the oracle the ANN indexes are tested against,
  * and the fallback for tiny repositories.
  */
object BruteForce {

  /** Top-k nearest by Euclidean distance; ties broken by index asc. */
  def search(vectors: IndexedSeq[Array[Float]], q: Array[Float], k: Int): Array[(Int, Float)] = {
    val n = vectors.length
    val kk = math.min(k, n)
    if (kk == 0) return Array.empty
    // Max-heap of size k on distance.
    val heap = new java.util.PriorityQueue[(Int, Float)](kk,
      (a: (Int, Float), b: (Int, Float)) => {
        val c = java.lang.Float.compare(b._2, a._2)
        if (c != 0) c else Integer.compare(b._1, a._1)
      })
    var i = 0
    while (i < n) {
      val d = VecOps.l2(q, vectors(i))
      if (heap.size < kk) heap.add((i, d))
      else {
        val top = heap.peek()
        if (d < top._2 || (d == top._2 && i < top._1)) { heap.poll(); heap.add((i, d)) }
      }
      i += 1
    }
    val out = new Array[(Int, Float)](heap.size)
    var j = out.length - 1
    while (j >= 0) { out(j) = heap.poll(); j -= 1 }
    out
  }
}
