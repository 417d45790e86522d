package repro.bench

import org.apache.spark.sql.{Dataset, SparkSession}
import repro.core.{DeepJoin, DeepJoinIndex}
import repro.embed._
import repro.join.{Joinability, Josie, LshEnsemble, Pexeso}
import repro.lake.{LakeColumn, LakeConfig, LakeGenerator}
import repro.text.{Contextualizer, TextOption}
import repro.train.{MlpBaseline, Trainer, TrainingData}
import scala.collection.concurrent.TrieMap
import scala.collection.parallel.CollectionConverters._

/** Which joinability definition an experiment targets. */
sealed trait JoinType { def label: String }
case object Equi extends JoinType { val label = "equi" }
final case class Semantic(tau: Double) extends JoinType {
  def label = f"semantic-tau$tau%.1f"
}

/** Shared experiment world for the benches: corpora, exact ground truth,
  * trained models and retrieval evaluation, cached so that the per-table
  * suites reuse one another's work.
  *
  * Default sizes are the paper's scaled by ~1/170 for the accuracy corpora
  * (train 30K→1.2K, repository 1M→6K, 50→25 queries); `BENCH_SCALE`
  * multiplies them. Every bench prints the scale it ran at.
  */
object World {

  val scale: Double = sys.env.getOrElse("BENCH_SCALE", "1.0").toDouble
  def trainN: Int = math.max(200, (1200 * scale).toInt)
  def repoN: Int = math.max(1000, (6000 * scale).toInt)
  def queryN: Int = math.max(10, (25 * scale).toInt)

  /** Positive-pair threshold t (Section 5.1). */
  val posThreshold = 0.7

  /** A corpus: repository (search target), training subset, query workload.
    * The training subset and the repository are disjoint id ranges of the
    * same generative process; queries use a salted id stream (no leakage),
    * mirroring the paper's sampling protocol.
    */
  final case class Corpus(
      cfg: LakeConfig,
      repo: Seq[LakeColumn],
      train: Seq[LakeColumn],
      queries: Seq[LakeColumn],
      repoDs: Dataset[LakeColumn],
      trainDs: Dataset[LakeColumn]) {
    lazy val repoById: Map[Long, LakeColumn] = repo.map(c => c.id -> c).toMap
    lazy val cellFrequency: Map[String, Long] = {
      val m = new java.util.HashMap[String, Long]()
      repo.foreach(_.cells.distinct.foreach(c => m.merge(c, 1L, _ + _)))
      import scala.jdk.CollectionConverters._
      m.asScala.toMap
    }
  }

  private val corpusCache = TrieMap.empty[(String, Int, Int, Int), Corpus]

  def corpus(spark: SparkSession, cfg: LakeConfig,
             nRepo: Int = repoN, nTrain: Int = trainN,
             nQuery: Int = queryN): Corpus =
    corpusCache.getOrElseUpdate((cfg.name, nRepo, nTrain, nQuery), {
      val repoDs = LakeGenerator.columns(spark, cfg, nRepo).cache()
      val trainDs = LakeGenerator.columns(spark, cfg, nTrain, idOffset = 500000000L).cache()
      val repo = repoDs.collect().toSeq.sortBy(_.id)
      val train = trainDs.collect().toSeq.sortBy(_.id)
      val queries = LakeGenerator.queriesLocal(cfg, nQuery)
      Corpus(cfg, repo, train, queries, repoDs, trainDs)
    })

  // ---------------------------------------------------------------- labels

  private val exactEquiCache = TrieMap.empty[(String, Int, Int), Map[Long, Seq[(Long, Double)]]]
  private val pexesoCache = TrieMap.empty[(String, Int), Pexeso]

  /** Exact equi top-k per query (Spark inverted-list job). */
  def exactEqui(spark: SparkSession, c: Corpus, k: Int): Map[Long, Seq[(Long, Double)]] =
    exactEquiCache.getOrElseUpdate((c.cfg.name, c.repo.size, k), {
      import spark.implicits._
      val qDs = spark.createDataset(c.queries)
      Joinability.equiTopKMap(spark, qDs, c.repoDs, k)
    })

  /** The PEXESO index over the corpus repository (shared across τ). */
  def pexeso(c: Corpus): Pexeso =
    pexesoCache.getOrElseUpdate((c.cfg.name, c.repo.size),
      Pexeso.build(c.repo.map(col => (col.id, col.cells))))

  private val exactSemCache = TrieMap.empty[(String, Int, Long, Int), Map[Long, Seq[(Long, Double)]]]

  /** Exact semantic top-k per query (PEXESO, data-parallel over queries). */
  def exactSemantic(spark: SparkSession, c: Corpus, tau: Double,
                    k: Int): Map[Long, Seq[(Long, Double)]] =
    exactSemCache.getOrElseUpdate(
      (c.cfg.name, c.repo.size, java.lang.Double.doubleToLongBits(tau), k), {
        val px = pexeso(c)
        c.queries.par.map(q => q.id -> px.topK(q.cells, tau, k)).seq.toMap
      })

  /** True joinability of (query, column) under the join type. */
  def jnLookup(c: Corpus, jt: JoinType): (LakeColumn, Long) => Double = jt match {
    case Equi =>
      (q, id) => c.repoById.get(id)
        .map(x => Joinability.equiJn(q.cells, x.cells)).getOrElse(0.0)
    case Semantic(tau) =>
      val px = pexeso(c)
      (q, id) => px.jnOf(q.cells, tau, id)
  }

  // ------------------------------------------------------------- training

  /** Positive pairs for the corpus under the join type (cached). */
  private val positivesCache = TrieMap.empty[(String, String, Int), Seq[TrainingData.Pair]]

  def positives(spark: SparkSession, c: Corpus, jt: JoinType): Seq[TrainingData.Pair] =
    positivesCache.getOrElseUpdate((c.cfg.name, jt.label, c.train.size), jt match {
      case Equi => TrainingData.equiPositives(spark, c.trainDs, posThreshold)
      case Semantic(tau) =>
        TrainingData.semanticPositives(spark, c.train, tau, posThreshold)
    })

  private val trainCellVecCache = TrieMap.empty[(String, Int), Map[Long, Array[Array[Float]]]]

  /** True pairwise joinability between training columns (negative targets). */
  def pairJn(c: Corpus, jt: JoinType): (LakeColumn, LakeColumn) => Double = jt match {
    case Equi => (a, b) => Joinability.equiJn(a.cells, b.cells)
    case Semantic(tau) =>
      val vecs = trainCellVecCache.getOrElseUpdate((c.cfg.name, c.train.size),
        c.train.par.map(col =>
          col.id -> repro.embed.CellEmbedder.default.embedColumn(col.cells)).seq.toMap)
      (a, b) => Joinability.semanticJn(vecs(a.id), vecs(b.id), tau)
  }

  /** The paper's best shuffle rates (Tables 11–12). */
  def defaultShuffleRate(corpusName: String, jt: JoinType): Double =
    (corpusName, jt) match {
      case ("webtable", Equi) => 0.2
      case ("webtable", _) => 0.3
      case ("wikitable", Equi) => 0.3
      case _ => 0.4
    }

  /** Cap on training pairs, to keep ablation sweeps tractable. */
  val maxTrainPairs = 20000

  private val modelCache = TrieMap.empty[String, PlmEmbedder]

  /** Fine-tune a DeepJoin model: featurize (Spark), augment, train head. */
  def trainDeepJoin(spark: SparkSession, c: Corpus, jt: JoinType,
                    plm: PlmConfig,
                    option: TextOption = TextOption.default,
                    shuffleRate: Double = -1.0,
                    epochs: Int = 2,
                    hardNegativeFrac: Double = 0.25,
                    mnrScale: Double = 20.0,
                    loss: String = "mnr",
                    headKind: String = "diag",
                    lr: Double = 2e-3): PlmEmbedder = {
    val rate = if (shuffleRate >= 0) shuffleRate else defaultShuffleRate(c.cfg.name, jt)
    val cacheKey = Seq(c.cfg.name, c.train.size, jt.label, plm.name, option.name,
      rate, epochs, hardNegativeFrac, mnrScale, loss, headKind, lr).mkString("/")
    modelCache.get(cacheKey) match {
      case Some(m) => return m
      case None =>
    }
    // DeepJoin's fine-tuned encoder pools cells idf-weighted (the paper's
    // "attention focuses on the cells more probable to match"); raw PLM
    // baselines do not (their pre-training never saw the repository).
    val ctx = new Contextualizer(option, frequency = c.cellFrequency)
    val base = new PlmEmbedder(plm, ctx, head = None, idfPooling = true)

    val pos0 = positives(spark, c, jt)
    val pos =
      if (pos0.size <= maxTrainPairs) pos0
      else {
        val r = new scala.util.Random(0xca11L)
        r.shuffle(pos0.toVector).take(maxTrainPairs)
      }
    val augmented = TrainingData.augment(pos, rate, seed = 0x5fffL)

    // Featurize every distinct column (including shuffled copies) on Spark.
    import spark.implicits._
    val originals = c.train
    val shuffledXs = augmented.drop(pos.size).map(_.x)
    val toEncode: Seq[(Long, LakeColumn)] =
      originals.map(col => (col.id, col)) ++
        shuffledXs.zipWithIndex.map { case (col, i) => (-(i + 1L), col) }
    val feats: Map[Long, Array[Float]] =
      spark.createDataset(toEncode)
        .repartition(spark.sparkContext.defaultParallelism * 2)
        .mapPartitions(_.map { case (key, col) => (key, base.baseFeatures(col)) })
        .collect()
        .toMap

    val trainSeed = Words.mixSeed(c.cfg.name, jt.label, option.name, rate)
    val effLr = if (lr > 0) lr else if (headKind == "diag") 5e-3 else 1e-3
    val trainCfg = Trainer.Config(epochs = epochs, lr = effLr,
      hardNegativeFrac = hardNegativeFrac, scale = mnrScale,
      headKind = headKind, seed = trainSeed)

    val (head, losses) =
      if (loss == "mnr") {
        // Masking uses the original x id even for shuffled copies (the
        // shuffled column has the same joinability structure as its source).
        val knownPos: Set[(Long, Long)] = pos0.map(p => (p.x.id, p.y.id)).toSet
        val examples = augmented.zipWithIndex.map { case (p, i) =>
          val xKey = if (i < pos.size) p.x.id else -(i - pos.size + 1L)
          Trainer.Example(feats(xKey), feats(p.y.id), p.x.id, p.y.id, p.x.domain)
        }.toIndexedSeq
        Trainer.train(examples, base.cfg.dim, trainCfg, knownPositives = knownPos)
      } else {
        // Graded cosine regression: positives with their jn targets plus
        // sampled same-domain and cross-domain negatives with true jn.
        val jn = pairJn(c, jt)
        val posEx = augmented.zipWithIndex.map { case (p, i) =>
          val xKey = if (i < pos.size) p.x.id else -(i - pos.size + 1L)
          Trainer.RegExample(feats(xKey), feats(p.y.id), p.jn.toFloat)
        }
        val rnd = new scala.util.Random(trainSeed ^ 0x9e9L)
        val byDomain = c.train.groupBy(_.domain).view.mapValues(_.toIndexedSeq).toMap
        val negEx = (0 until math.max(64, augmented.size * 3 / 2)).flatMap { i =>
          val a = c.train(rnd.nextInt(c.train.size))
          val b =
            if (i % 2 == 0) {
              val grp = byDomain(a.domain)
              grp(rnd.nextInt(grp.size))
            } else c.train(rnd.nextInt(c.train.size))
          if (b.id == a.id) None
          else Some(Trainer.RegExample(feats(a.id), feats(b.id), jn(a, b).toFloat))
        }
        Trainer.trainRegression((posEx ++ negEx).toIndexedSeq, base.cfg.dim, trainCfg)
      }
    Console.err.println(
      f"[train/$loss] ${c.cfg.name}/${jt.label}/${option.name}/r=$rate%.1f pos=${augmented.size} " +
      s"losses=${losses.map(l => f"$l%.3f").mkString(",")}")
    val model = new PlmEmbedder(plm, ctx, Some(head), idfPooling = true)
    modelCache.put(cacheKey, model)
    model
  }

  private object Words {
    def mixSeed(parts: Any*): Long =
      parts.map(_.toString.hashCode.toLong).foldLeft(0x7a11L)((a, b) => a * 31 + b)
  }

  /** The MLP baseline trained for the corpus (equi tables only). */
  def trainMlp(spark: SparkSession, c: Corpus): MlpBaseline = {
    val base = new FastTextEmbedder()
    val pos0 = positives(spark, c, Equi)
    val pos = if (pos0.size <= maxTrainPairs) pos0
              else new scala.util.Random(0x3bL).shuffle(pos0.toVector).take(maxTrainPairs)
    MlpBaseline.trainFromPairs(base, pos, c.train,
      (a, b) => Joinability.equiJn(a.cells, b.cells))
  }

  // ------------------------------------------------------------ retrieval

  /** Build an HNSW index for an embedder over the corpus repository. */
  def index(spark: SparkSession, c: Corpus, embedder: ColumnEmbedder): DeepJoinIndex =
    DeepJoin.buildIndex(DeepJoin.encodeAll(spark, c.repoDs, embedder), embedder)

  /** Retrieve top-k ids for every query. */
  def retrieveAll(idx: DeepJoinIndex, queries: Seq[LakeColumn], k: Int,
                  ef: Int = 96): Map[Long, Seq[Long]] =
    queries.map { q =>
      val (res, _) = DeepJoin.search(idx, q, k, ef)
      q.id -> res.map(_._1)
    }.toMap

  // -------------------------------------------------------------- metrics

  /** Mean precision@k and NDCG@k over queries for a ranked retrieval. */
  def evalRetrieval(c: Corpus, jt: JoinType,
                    model: Map[Long, Seq[Long]],
                    exact: Map[Long, Seq[(Long, Double)]],
                    ks: Seq[Int]): Map[Int, (Double, Double)] = {
    import repro.eval.Metrics
    val queries = c.queries
    ks.map { k =>
      val (ps, ns) = queries.map { q =>
        val ex = exact.getOrElse(q.id, Seq.empty)
        val exIds = ex.map(_._1)
        val mod = model.getOrElse(q.id, Seq.empty)
        val jnKnown = ex.toMap
        val lookup = jnLookup(c, jt)
        val jnOf = (id: Long) => jnKnown.getOrElse(id, lookup(q, id))
        (Metrics.precisionAtK(mod, exIds, k), Metrics.ndcgAtK(mod, exIds, k, jnOf))
      }.unzip
      k -> (Metrics.mean(ps), Metrics.mean(ns))
    }.toMap
  }
}
