package repro.bench

import org.apache.spark.sql.SparkSession
import repro.core.DeepJoin
import repro.embed._
import repro.join.{Josie, LshEnsemble, Pexeso}
import repro.lake.{LakeColumn, LakeConfig, LakeGenerator}
import repro.text.{Contextualizer, TextOption}

/** Efficiency experiments: Tables 13–15 of the paper.
  *
  * End-to-end per-query processing time (column-to-text transformation +
  * query encoding + ANN search for the embedding methods; index probing for
  * JOSIE / LSH Ensemble / PEXESO). "DeepJoin (GPU)" is the same encoder with
  * its per-token inner loops run data-parallel across cores — the stand-in
  * for GPU-accelerated query encoding (ANN is unchanged), see DESIGN.md.
  *
  * Repository sizes are the paper's scaled by ~1/50: webtable 20K..100K
  * (paper 1M..5M), wikitable 4K..20K (paper 200K..1M). Smaller repositories
  * are prefixes of the largest one, so each sweep generates data once, and
  * HNSW indexes are cached per (corpus, size, embedder) — CPU and GPU-sim
  * rows share the same index, as they do in the paper.
  */
object TimingBench {

  import scala.collection.concurrent.TrieMap

  // Generated repositories and bulk embeddings are shared across Tables
  // 13/14/15 (the suites run in one JVM).
  private val repoCache = TrieMap.empty[(String, Int), Seq[LakeColumn]]
  private val embCache = TrieMap.empty[(String, Int, String), Array[(Long, Array[Float])]]

  def repoFor(spark: SparkSession, cfg: LakeConfig, n: Int): Seq[LakeColumn] =
    repoCache.getOrElseUpdate((cfg.name, n),
      LakeGenerator.columns(spark, cfg, n).collect().toSeq.sortBy(_.id))

  def embFor(spark: SparkSession, cfg: LakeConfig, repo: Seq[LakeColumn],
             name: String, emb: ColumnEmbedder): Array[(Long, Array[Float])] =
    embCache.getOrElseUpdate((cfg.name, repo.size, name), {
      import spark.implicits._
      DeepJoin.encodeAll(spark, spark.createDataset(repo), emb)
    })

  /** A per-query timed runner: returns (encodeMs, totalMs). */
  trait Runner { def run(q: LakeColumn, k: Int): (Double, Double) }

  private def timeMs[A](f: => A): Double = {
    val t0 = System.nanoTime()
    f
    (System.nanoTime() - t0) / 1e6
  }

  final class JosieRunner(repo: Seq[LakeColumn]) extends Runner {
    val idx: Josie = Josie.build(repo.map(c => (c.id, c.cells)))
    def run(q: LakeColumn, k: Int): (Double, Double) = (0.0, timeMs(idx.topK(q.cells, k)))
  }

  final class LshRunner(repo: Seq[LakeColumn]) extends Runner {
    val idx: LshEnsemble = LshEnsemble.build(repo.map(c => (c.id, c.cells)))
    def run(q: LakeColumn, k: Int): (Double, Double) = (0.0, timeMs(idx.topK(q.cells, k)))
  }

  final class PexesoRunner(repo: Seq[LakeColumn], tau: Double) extends Runner {
    val idx: Pexeso = Pexeso.build(repo.map(c => (c.id, c.cells)))
    def run(q: LakeColumn, k: Int): (Double, Double) = (0.0, timeMs(idx.topK(q.cells, tau, k)))
  }

  private val idxCache = TrieMap.empty[(String, Int, String), repro.core.DeepJoinIndex]

  /** HNSW index over a prefix of cached embeddings (built once per
    * (corpus, size, embedder); lighter construction parameters than the
    * accuracy benches — this table measures time, not recall).
    */
  def indexFor(cfgName: String, embName: String, n: Int,
               embeddings: Array[(Long, Array[Float])],
               embedder: ColumnEmbedder): repro.core.DeepJoinIndex =
    idxCache.getOrElseUpdate((cfgName, n, embName),
      DeepJoin.buildIndex(embeddings.take(n), embedder, m = 12, efConstruction = 64))

  /** Embedding-based runner over a (cached) HNSW index; the query embedder
    * may differ from the one that built the index (CPU vs GPU-sim).
    */
  final class EmbeddingRunner(idx: repro.core.DeepJoinIndex,
                              queryEmbedder: ColumnEmbedder) extends Runner {
    def run(q: LakeColumn, k: Int): (Double, Double) = {
      val t0 = System.nanoTime()
      val qv = queryEmbedder.embed(q)
      val t1 = System.nanoTime()
      idx.hnsw.search(qv, k, math.max(96, k + 16))
      val t2 = System.nanoTime()
      ((t1 - t0) / 1e6, (t2 - t0) / 1e6)
    }
  }

  /** Mean (encodeMs, totalMs) over the query workload. */
  def measure(runner: Runner, queries: Seq[LakeColumn], k: Int,
              warmup: Int = 3): (Double, Double) = {
    queries.take(warmup).foreach(runner.run(_, k))
    val times = queries.map(runner.run(_, k))
    (times.map(_._1).sum / times.size, times.map(_._2).sum / times.size)
  }

  /** Sweep sizes for a corpus (scaled ~1/20 from the paper's 1M..5M and
    * 200K..1M — large enough that the linear growth of JOSIE / LSH Ensemble
    * / PEXESO vs the flat DeepJoin curve is clearly visible).
    */
  def sizesFor(cfgName: String): Seq[Int] = {
    val base = if (cfgName == "webtable") Seq(20000, 40000, 60000, 80000, 100000)
               else Seq(4000, 8000, 12000, 16000, 20000)
    base.map(n => math.max(1000, (n * World.scale).toInt))
  }

  private def queriesFor(cfg: LakeConfig, n: Int = 10): Seq[LakeColumn] =
    LakeGenerator.queriesLocal(cfg, n)

  /** DeepJoin embedders (CPU and GPU-sim) for timing, trained at accuracy
    * scale and reused across repository sizes (as the paper trains once).
    */
  private def deepJoinEmbedders(spark: SparkSession, cfg: LakeConfig,
                                jt: JoinType): (PlmEmbedder, PlmEmbedder) = {
    val c = World.corpus(spark, cfg)
    val cpu = World.trainDeepJoin(spark, c, jt, PlmConfig.mpnet)
    val gpu = new PlmEmbedder(cpu.cfg, cpu.ctx, cpu.head, parallel = true,
      idfPooling = cpu.idfPooling)
    (cpu, gpu)
  }

  /** Table 13: time per query vs repository size, k = 10. */
  def table13(spark: SparkSession): Unit = {
    val k = 10
    Seq(LakeConfig.webtable(), LakeConfig.wikitable()).foreach { cfg =>
      val sizes = sizesFor(cfg.name)
      println(s"== Table 13 (${cfg.name}): ms/query vs |X| = ${sizes.mkString(",")} " +
        s"(paper: ${if (cfg.name == "webtable") "1M..5M" else "200K..1M"}), k=$k")
      val queries = queriesFor(cfg)
      val repoAll = repoFor(spark, cfg, sizes.max)

      val (djCpu, djGpu) = deepJoinEmbedders(spark, cfg, Equi)
      val ft = new FastTextEmbedder()
      val ftEmbAll = embFor(spark, cfg, repoAll, "fastText", ft)
      val djEmbAll = embFor(spark, cfg, repoAll, "dj-equi", djCpu)

      def row(name: String, mk: Seq[LakeColumn] => Runner,
              slice: Int => Seq[LakeColumn] = n => repoAll.take(n)): Unit = {
        val cells = sizes.map { n =>
          val r = mk(slice(n))
          val (enc, tot) = measure(r, queries, k)
          (enc, tot)
        }
        val encStr = f"${cells.head._1}%8.2f"
        println(f"$name%-18s enc=$encStr  total=${cells.map(c => f"${c._2}%8.2f").mkString(" ")}")
      }

      println(s"-- equi-joins")
      row("LSH Ensemble", repo => new LshRunner(repo))
      row("JOSIE", repo => new JosieRunner(repo))
      row("fastText", repo =>
        new EmbeddingRunner(indexFor(cfg.name, "fastText", repo.size, ftEmbAll, ft), ft))
      row("DeepJoin (CPU)", repo =>
        new EmbeddingRunner(indexFor(cfg.name, "dj-equi", repo.size, djEmbAll, djCpu), djCpu))
      row("DeepJoin (GPU)", repo =>
        new EmbeddingRunner(indexFor(cfg.name, "dj-equi", repo.size, djEmbAll, djCpu), djGpu))

      println(s"-- semantic joins (tau=0.9)")
      val (djCpuS, djGpuS) = deepJoinEmbedders(spark, cfg, Semantic(0.9))
      val djEmbAllS = embFor(spark, cfg, repoAll, "dj-sem", djCpuS)
      // PEXESO over the full sweep is the slowest method; cap its sizes at
      // the first three to keep the bench under control and note the cap.
      val pexesoSizes = sizes.take(3)
      val pexTimes = pexesoSizes.map { n =>
        val r = new PexesoRunner(repoAll.take(n), 0.9)
        measure(r, queries, k)._2
      }
      println(f"${"PEXESO"}%-18s enc=${0.0}%8.2f  total=${pexTimes.map(t => f"$t%8.2f").mkString(" ")}  (first ${pexesoSizes.size} sizes)")
      row("DeepJoin (CPU)", repo =>
        new EmbeddingRunner(indexFor(cfg.name, "dj-sem", repo.size, djEmbAllS, djCpuS), djCpuS))
      row("DeepJoin (GPU)", repo =>
        new EmbeddingRunner(indexFor(cfg.name, "dj-sem", repo.size, djEmbAllS, djCpuS), djGpuS))
    }
  }

  /** Table 14: time per query vs k at the largest sweep size. */
  def table14(spark: SparkSession): Unit = {
    val ksSweep = Seq(10, 20, 30, 40, 50)
    Seq(LakeConfig.webtable(), LakeConfig.wikitable()).foreach { cfg =>
      val n = sizesFor(cfg.name).max
      println(s"== Table 14 (${cfg.name}): ms/query vs k = ${ksSweep.mkString(",")}, |X|=$n")
      val queries = queriesFor(cfg)
      val repo = repoFor(spark, cfg, n)
      val (djCpu, djGpu) = deepJoinEmbedders(spark, cfg, Equi)
      val ft = new FastTextEmbedder()
      val ftEmb = embFor(spark, cfg, repo, "fastText", ft)
      val djEmb = embFor(spark, cfg, repo, "dj-equi", djCpu)

      def row(name: String, runner: Runner): Unit = {
        val t = ksSweep.map(k => measure(runner, queries, k)._2)
        println(f"$name%-18s ${t.map(x => f"$x%8.2f").mkString(" ")}")
      }
      println(s"-- equi-joins")
      row("LSH Ensemble", new LshRunner(repo))
      row("JOSIE", new JosieRunner(repo))
      row("fastText", new EmbeddingRunner(indexFor(cfg.name, "fastText", n, ftEmb, ft), ft))
      val djIdx = indexFor(cfg.name, "dj-equi", n, djEmb, djCpu)
      row("DeepJoin (CPU)", new EmbeddingRunner(djIdx, djCpu))
      row("DeepJoin (GPU)", new EmbeddingRunner(djIdx, djGpu))

      println(s"-- semantic joins (tau=0.9)")
      val (djCpuS, djGpuS) = deepJoinEmbedders(spark, cfg, Semantic(0.9))
      val djEmbS = embFor(spark, cfg, repo, "dj-sem", djCpuS)
      val nPex = math.min(n, sizesFor(cfg.name).head)
      row(s"PEXESO (|X|=$nPex)", new PexesoRunner(repo.take(nPex), 0.9))
      val djIdxS = indexFor(cfg.name, "dj-sem", n, djEmbS, djCpuS)
      row("DeepJoin (CPU)", new EmbeddingRunner(djIdxS, djCpuS))
      row("DeepJoin (GPU)", new EmbeddingRunner(djIdxS, djGpuS))
    }
  }

  /** Table 15: time per query vs column size band (webtable), k = 10. */
  def table15(spark: SparkSession): Unit = {
    val cfg = LakeConfig.webtable()
    val k = 10
    val nPerBand = math.max(2000, (20000 * World.scale).toInt)
    println(s"== Table 15 (webtable): ms/query vs column size, $nPerBand columns " +
      s"per band (paper: 300K), k=$k")
    val (djCpu, djGpu) = deepJoinEmbedders(spark, cfg, Equi)
    val (djCpuS, djGpuS) = deepJoinEmbedders(spark, cfg, Semantic(0.9))
    val ft = new FastTextEmbedder()
    AccuracyBench.bands.zipWithIndex.foreach { case ((label, lo, hi), bi) =>
      val hiCap = if (hi == Int.MaxValue) cfg.maxCells else hi
      val repo = LakeGenerator.columnsInSizeBand(spark, cfg, nPerBand, lo, hiCap,
        salt = 0xf15L + bi).collect().toSeq.sortBy(_.id)
      val queries = LakeGenerator.queriesInSizeBandLocal(cfg, 10, lo, hiCap)
      import spark.implicits._
      val repoDs = spark.createDataset(repo)
      val ftEmb = DeepJoin.encodeAll(spark, repoDs, ft)
      val djEmb = DeepJoin.encodeAll(spark, repoDs, djCpu)
      val djEmbS = DeepJoin.encodeAll(spark, repoDs, djCpuS)

      println(s"-- |Q|,|X| in $label")
      def row(name: String, runner: Runner): Unit = {
        val (enc, tot) = measure(runner, queries, k)
        println(f"$name%-18s enc=$enc%8.2f total=$tot%8.2f")
      }
      row("LSH Ensemble", new LshRunner(repo))
      row("JOSIE", new JosieRunner(repo))
      row("fastText", new EmbeddingRunner(
        indexFor(cfg.name, s"b$bi-fastText", repo.size, ftEmb, ft), ft))
      val djIdx = indexFor(cfg.name, s"b$bi-dj-equi", repo.size, djEmb, djCpu)
      row("DeepJoin (CPU)", new EmbeddingRunner(djIdx, djCpu))
      row("DeepJoin (GPU)", new EmbeddingRunner(djIdx, djGpu))
      row("PEXESO", new PexesoRunner(repo, 0.9))
      val djIdxS = indexFor(cfg.name, s"b$bi-dj-sem", repo.size, djEmbS, djCpuS)
      row("DeepJoin-sem (CPU)", new EmbeddingRunner(djIdxS, djCpuS))
      row("DeepJoin-sem (GPU)", new EmbeddingRunner(djIdxS, djGpuS))
    }
  }
}
