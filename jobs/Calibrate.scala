package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench._
import repro.embed._
import repro.join.Joinability
import repro.lake._
import repro.text.{Contextualizer, TextOption}

/** Scratch calibration entrypoint: sanity-checks the generator's joinability
  * structure, the cell-embedding distance bands vs τ, and the method
  * ordering on a small corpus. Not part of the paper's tables.
  */
object Calibrate {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder()
      .master("local[*]")
      .appName("calibrate")
      .config("spark.sql.shuffle.partitions", "64")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    spark.sparkContext.setLogLevel("WARN")

    val cfg = LakeConfig.webtable()
    val c = World.corpus(spark, cfg, nRepo = 2000, nTrain = 1000, nQuery = 10)

    println(s"== corpus: repo=${c.repo.size} train=${c.train.size} queries=${c.queries.size}")
    val sizes = c.repo.map(_.size)
    println(f"   |X|: min=${sizes.min} max=${sizes.max} avg=${sizes.sum.toDouble / sizes.size}%.2f")

    // Cell embedding distance bands.
    val ce = CellEmbedder.default
    val r = new scala.util.Random(1)
    def dist(a: String, b: String) = VecOps.l2(ce.embed(a), ce.embed(b))
    val canon = (0 until 200).map(i => Words.entityCanonical(cfg, i % 10, i))
    val typo = canon.map(s => if (s.length > 4) s.substring(0, 2) + s.substring(3) else s.toUpperCase)
    val abbrev = canon.map(s => s.split(' ').map(w => w.take(3) + ".").mkString(" "))
    println(f"   d(canonical, typo):   ${canon.zip(typo).map { case (a, b) => dist(a, b) }.sum / 200}%.3f")
    println(f"   d(canonical, abbrev): ${canon.zip(abbrev).map { case (a, b) => dist(a, b) }.sum / 200}%.3f")
    println(f"   d(random pairs):      ${(0 until 200).map(_ => dist(canon(r.nextInt(200)), canon(r.nextInt(200)))).sum / 200}%.3f")

    // Positives.
    val t0 = System.currentTimeMillis()
    val eqPos = World.positives(spark, c, Equi)
    println(s"   equi positives(t=0.7): ${eqPos.size}  [${System.currentTimeMillis() - t0} ms]")
    val t1 = System.currentTimeMillis()
    val semPos = World.positives(spark, c, Semantic(0.9))
    println(s"   semantic positives(tau=0.9): ${semPos.size}  [${System.currentTimeMillis() - t1} ms]")

    // Exact ground truth.
    val k = 10
    val exEq = World.exactEqui(spark, c, k)
    val avgTopJn = exEq.values.map(_.headOption.map(_._2).getOrElse(0.0)).sum / exEq.size
    println(f"   exact equi: queries with results=${exEq.size}, avg top-1 jn=$avgTopJn%.3f")
    val exSem = World.exactSemantic(spark, c, 0.9, k)
    println(f"   exact semantic tau=0.9: avg top-1 jn=${exSem.values.map(_.headOption.map(_._2).getOrElse(0.0)).sum / math.max(1, exSem.size)}%.3f")

    // Method ordering, equi, k=10.
    def p10(emb: ColumnEmbedder): Double = {
      val idx = World.index(spark, c, emb)
      val res = World.retrieveAll(idx, c.queries, k)
      World.evalRetrieval(c, Equi, res, exEq, Seq(k))(k)._1
    }
    val ctxCol = new Contextualizer(TextOption.Col)
    val ctxBest = new Contextualizer(TextOption.default, frequency = c.cellFrequency)
    println(f"   P@10 fastText      = ${p10(new FastTextEmbedder())}%.3f")
    println(f"   P@10 BERT(raw)     = ${p10(new PlmEmbedder(PlmConfig.bert, ctxCol))}%.3f")
    println(f"   P@10 MPNet(raw)    = ${p10(new PlmEmbedder(PlmConfig.mpnet, ctxCol))}%.3f")
    println(f"   P@10 TaBERT        = ${p10(new TabertEmbedder())}%.3f")
    // Control: untrained head (isolates head-architecture effects).
    val untrainedHead = new repro.train.DenseHead(384, 256, 384)
    println(f"   P@10 MPNet+untrained-head = ${p10(new PlmEmbedder(PlmConfig.mpnet, ctxBest, Some(untrainedHead)))}%.3f")
    println(f"   P@10 MPNet(raw, best ctx) = ${p10(new PlmEmbedder(PlmConfig.mpnet, ctxBest))}%.3f")
    for (epochs <- Seq(2, 4)) {
      val dj = World.trainDeepJoin(spark, c, Equi, PlmConfig.mpnet,
        TextOption.default, epochs = epochs)
      println(f"   P@10 DeepJoin-MPNet(e=$epochs) = ${p10(dj)}%.3f")
    }

    // Semantic retrieval, tau = 0.9.
    def p10Sem(emb: ColumnEmbedder): Double = {
      val idx = World.index(spark, c, emb)
      val res = World.retrieveAll(idx, c.queries, k)
      World.evalRetrieval(c, Semantic(0.9), res, exSem, Seq(k))(k)._1
    }
    println(f"   P@10sem fastText = ${p10Sem(new FastTextEmbedder())}%.3f")
    val djSem = World.trainDeepJoin(spark, c, Semantic(0.9), PlmConfig.mpnet, TextOption.default)
    println(f"   P@10sem DeepJoin-MPNet = ${p10Sem(djSem)}%.3f")

    // JOSIE exactness + LSH Ensemble quality.
    val josie = repro.join.Josie.build(c.repo.map(col => (col.id, col.cells)))
    val josieAgrees = c.queries.count { q =>
      val a = josie.topK(q.cells, k).map(_._1)
      val b = exEq.getOrElse(q.id, Seq.empty).map(_._1)
      a == b
    }
    println(s"   JOSIE top-$k agrees with exact on $josieAgrees/${c.queries.size} queries")
    val lsh = repro.join.LshEnsemble.build(c.repo.map(col => (col.id, col.cells)))
    val lshRes = c.queries.map(q => q.id -> lsh.topK(q.cells, k).map(_._1)).toMap
    println(f"   P@10 LSH Ensemble = ${World.evalRetrieval(c, Equi, lshRes, exEq, Seq(k))(k)._1}%.3f")
    val djD = World.trainDeepJoin(spark, c, Equi, PlmConfig.distilbert, TextOption.default)
    println(f"   P@10 DeepJoin-DistilBERT = ${p10(djD)}%.3f")

    // Encode timing.
    val q = c.queries.head
    val embCpu = new PlmEmbedder(PlmConfig.mpnet, ctxBest)
    val warm = (0 until 5).map(_ => embCpu.embed(q))
    val n = 20
    val tEnc = System.nanoTime()
    (0 until n).foreach(_ => embCpu.embed(q))
    println(f"   encode (MPNet, CPU): ${(System.nanoTime() - tEnc) / 1e6 / n}%.2f ms/query (|Q|=${q.size})")

    spark.stop()
  }
}
