package repro.jobs

import repro.ann.{BruteForce, Hnsw}
import scala.util.Random

/** Scratch: HNSW recall/connectivity diagnostics. */
object HnswDebug {
  def main(args: Array[String]): Unit = {
    val dim = 16
    val r = new Random(7)
    val centers = IndexedSeq.fill(12)(Array.fill(dim)(r.nextGaussian().toFloat))
    val data = IndexedSeq.tabulate(1500) { i =>
      val c = centers(i % 12)
      Array.tabulate(dim)(j => c(j) + 0.15f * r.nextGaussian().toFloat)
    }
    val h = new Hnsw(dim, m = 12, efConstruction = 100, seed = 5L)
    data.foreach(h.add)

    // recall on a FIXED query set (comparable across ef)
    val rr = new Random(11)
    val qs = IndexedSeq.fill(30)(Array.fill(dim)(rr.nextGaussian().toFloat))
    def recall(ef: Int): Double = {
      val recs = qs.map { q =>
        val approx = h.search(q, 10, ef).map(_._1).toSet
        val exact = BruteForce.search(data, q, 10).map(_._1).toSet
        approx.intersect(exact).size.toDouble / exact.size
      }
      recs.sum / recs.size
    }
    println(s"recall ef=16: ${recall(16)}")
    println(s"recall ef=64: ${recall(64)}")
    println(s"recall ef=128: ${recall(128)}")
    println(s"recall ef=512: ${recall(512)}")

    // layer-0 connectivity via BFS over undirected closure
    val n = data.size
    val adj = Array.fill(n)(scala.collection.mutable.Set.empty[Int])
    (0 until n).foreach { i =>
      h.neighbors(i, 0).foreach { j => adj(i) += j; adj(j) += i }
    }
    val seen = Array.fill(n)(false)
    var comps = 0
    (0 until n).foreach { s =>
      if (!seen(s)) {
        comps += 1
        val st = scala.collection.mutable.Stack(s)
        while (st.nonEmpty) {
          val x = st.pop()
          if (!seen(x)) { seen(x) = true; adj(x).foreach(st.push) }
        }
      }
    }
    println(s"layer-0 connected components: $comps")
    val degs = (0 until n).map(i => h.neighbors(i, 0).length)
    println(s"layer-0 degree: min=${degs.min} avg=${degs.sum.toDouble / n} max=${degs.max}")
  }
}
