package repro.bench

import repro.SparkSpec
import repro.embed.{FastTextEmbedder, PlmConfig}
import repro.lake.LakeConfig
import repro.text.TextOption

/** End-to-end pipeline integration at toy scale: corpus → labels → training
  * → index → retrieval → metrics. The bench suites run the full-scale
  * versions; this guards the plumbing in the unit-test run.
  */
class WorldIntegrationSpec extends SparkSpec {
  private val cfg = LakeConfig.webtable(seed = 99L) // distinct cache key
  private lazy val c = World.corpus(spark, cfg, nRepo = 400, nTrain = 200, nQuery = 5)

  test("corpus has disjoint repo/train/query id spaces") {
    val repoIds = c.repo.map(_.id).toSet
    val trainIds = c.train.map(_.id).toSet
    val qIds = c.queries.map(_.id).toSet
    assert(repoIds.intersect(trainIds).isEmpty)
    assert(repoIds.intersect(qIds).isEmpty)
  }
  test("cell frequency counts columns containing each value") {
    val v = c.repo.head.cells.head
    val expected = c.repo.count(_.cells.contains(v))
    assert(c.cellFrequency(v) == expected)
  }
  test("exact equi ground truth is populated and correctly ordered") {
    val ex = World.exactEqui(spark, c, 10)
    assert(ex.nonEmpty)
    ex.values.foreach { ranked =>
      val jns = ranked.map(_._2)
      assert(jns == jns.sorted.reverse)
    }
  }
  test("exact semantic ground truth is populated") {
    val ex = World.exactSemantic(spark, c, 0.9, 10)
    assert(ex.values.exists(_.nonEmpty))
  }
  test("equi positives exist at the paper's threshold") {
    assert(World.positives(spark, c, Equi).nonEmpty)
  }
  test("trainDeepJoin produces a working fine-tuned embedder") {
    val dj = World.trainDeepJoin(spark, c, Equi, PlmConfig.distilbert,
      TextOption.default, epochs = 1)
    assert(dj.head.isDefined)
    val v = dj.embed(c.queries.head)
    assert(v.length == dj.dim)
  }
  test("retrieval + evaluation produces sane precision for fastText") {
    val idx = World.index(spark, c, new FastTextEmbedder())
    val res = World.retrieveAll(idx, c.queries, 10)
    val ex = World.exactEqui(spark, c, 10)
    val m = World.evalRetrieval(c, Equi, res, ex, Seq(10))
    val (p, n) = m(10)
    assert(p >= 0.0 && p <= 1.0)
    assert(n >= 0.0 && n <= 1.5) // model NDCG can slightly exceed 1 on ties
  }
  test("jnLookup agrees with direct computation (equi)") {
    val look = World.jnLookup(c, Equi)
    val q = c.queries.head
    val x = c.repo.head
    assert(look(q, x.id) == repro.join.Joinability.equiJn(q.cells, x.cells))
  }
  test("defaultShuffleRate matches the paper's best settings") {
    assert(World.defaultShuffleRate("webtable", Equi) == 0.2)
    assert(World.defaultShuffleRate("webtable", Semantic(0.9)) == 0.3)
    assert(World.defaultShuffleRate("wikitable", Equi) == 0.3)
    assert(World.defaultShuffleRate("wikitable", Semantic(0.9)) == 0.4)
  }
  test("entity joinability ('expert' truth) is within [0, 1] and symmetric bounds") {
    val q = c.queries.head
    c.repo.take(20).foreach { x =>
      val jn = StatsAndExpertBench.entityJn(q, x)
      assert(jn >= 0.0 && jn <= 1.0)
    }
  }
}
