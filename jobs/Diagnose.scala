package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench._
import repro.embed._
import repro.lake._
import repro.text.{Contextualizer, TextOption}

/** Diagnostic entrypoint: decomposes where retrieval precision is won and
  * lost (cluster structure of the exact top-k, oracle embedders, train/repo
  * generalization of the fine-tuned head). Not part of the paper's tables.
  */
object Diagnose {

  /** Oracle: embeds only the latent (domain, anchor) — upper bound for any
    * method that ranks purely by cluster membership.
    */
  final class ClusterOracle extends ColumnEmbedder {
    override val name = "cluster-oracle"
    override val dim = 64
    private val emb = new HashEmbedder(dim, 0xabcdeL, useCharNgrams = false)
    override def embed(col: LakeColumn): Array[Float] =
      emb.embedText(Seq(s"d${col.domain}a${col.anchor}"))
  }

  /** Title-segment-only embedder (is the provenance word usable?). */
  final class TitleOnly extends ColumnEmbedder {
    override val name = "title-only"
    override val dim = 64
    private val emb = new HashEmbedder(dim, 0x7117L, useCharNgrams = true)
    override def embed(col: LakeColumn): Array[Float] =
      emb.embedText(repro.text.Tokenizer.tokenize(col.tableTitle))
  }

  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder().master("local[*]").appName("diagnose")
      .config("spark.sql.shuffle.partitions", "64")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    spark.sparkContext.setLogLevel("WARN")

    val cfg = LakeConfig.webtable()
    val c = World.corpus(spark, cfg, nRepo = 2000, nTrain = 1000, nQuery = 10)
    val k = 10
    val exEq = World.exactEqui(spark, c, k)

    // 1. Cluster composition of the exact top-k.
    val sameAnchor = c.queries.map { q =>
      val top = exEq.getOrElse(q.id, Seq.empty).map(_._1)
      top.count { id =>
        val x = c.repoById(id)
        x.domain == q.domain && x.anchor == q.anchor && q.anchor >= 0
      }.toDouble / math.max(1, top.size)
    }
    println(f"1. exact top-$k same-(domain,anchor) fraction: ${sameAnchor.sum / sameAnchor.size}%.3f")
    val sameDomain = c.queries.map { q =>
      val top = exEq.getOrElse(q.id, Seq.empty).map(_._1)
      top.count(id => c.repoById(id).domain == q.domain).toDouble / math.max(1, top.size)
    }
    println(f"   exact top-$k same-domain fraction:          ${sameDomain.sum / sameDomain.size}%.3f")

    def p10(emb: ColumnEmbedder): Double = {
      val idx = World.index(spark, c, emb)
      val res = World.retrieveAll(idx, c.queries, k)
      World.evalRetrieval(c, Equi, res, exEq, Seq(k))(k)._1
    }
    println(f"2. P@10 cluster-oracle = ${p10(new ClusterOracle)}%.3f")
    println(f"   P@10 title-only     = ${p10(new TitleOnly)}%.3f")
    println(f"   P@10 fastText       = ${p10(new FastTextEmbedder())}%.3f")

    // 3. Generalization: cosine gaps on REPO columns for base vs trained.
    val ctx = new Contextualizer(TextOption.default, frequency = c.cellFrequency)
    val base = new PlmEmbedder(PlmConfig.mpnet, ctx)
    val trained = World.trainDeepJoin(spark, c, Equi, PlmConfig.mpnet,
      TextOption.default, epochs = 2)
    def cosStats(emb: ColumnEmbedder, name: String): Unit = {
      val r = new scala.util.Random(5)
      val cols = r.shuffle(c.repo.toVector).take(400)
      val vecs = cols.map(col => (col, emb.embed(col)))
      def avgCos(p: ((LakeColumn, Array[Float]), (LakeColumn, Array[Float])) => Boolean): Double = {
        val cs = for {
          i <- vecs.indices; j <- (i + 1) until vecs.length
          if p(vecs(i), vecs(j))
        } yield VecOps.dot(vecs(i)._2, vecs(j)._2).toDouble
        if (cs.isEmpty) Double.NaN else cs.sum / cs.size
      }
      val sameAnc = avgCos((a, b) => a._1.domain == b._1.domain && a._1.anchor == b._1.anchor && a._1.anchor >= 0)
      val sameDom = avgCos((a, b) => a._1.domain == b._1.domain && (a._1.anchor != b._1.anchor || a._1.anchor < 0))
      val cross = avgCos((a, b) => a._1.domain != b._1.domain)
      println(f"   [$name] repo cos: sameAnchor=$sameAnc%.3f sameDomainOtherAnchor=$sameDom%.3f crossDomain=$cross%.3f")
    }
    cosStats(base, "base   ")
    cosStats(trained, "trained")
    println(f"   P@10 base(best ctx) = ${p10(base)}%.3f ; trained = ${p10(trained)}%.3f")

    spark.stop()
  }
}
