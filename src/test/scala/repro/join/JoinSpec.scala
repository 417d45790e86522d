package repro.join

import org.scalatest.funsuite.AnyFunSuite
import repro.SparkSpec
import repro.embed.CellEmbedder
import repro.lake.{LakeConfig, LakeGenerator}

object JoinFixtures {
  val cfg: LakeConfig = LakeConfig.webtable()
  lazy val repo: Seq[repro.lake.LakeColumn] =
    (0 until 400).map(i => LakeGenerator.genColumn(cfg, i))
  lazy val queries: Seq[repro.lake.LakeColumn] = LakeGenerator.queriesLocal(cfg, 8)

  /** Brute-force exact equi top-k with the repo-wide tie-break. */
  def bruteEquiTopK(q: Seq[String], k: Int): Seq[(Long, Double)] =
    repo.map(c => (c.id, Joinability.equiJn(q, c.cells)))
      .filter(_._2 > 0)
      .sortBy { case (id, jn) => (-jn, id) }
      .take(k)

  /** Brute-force exact semantic top-k. */
  def bruteSemTopK(q: Seq[String], tau: Double, k: Int): Seq[(Long, Double)] = {
    val ce = CellEmbedder.default
    val qv = ce.embedColumn(q)
    repo.map(c => (c.id, Joinability.semanticJn(qv, ce.embedColumn(c.cells), tau)))
      .filter(_._2 > 0)
      .sortBy { case (id, jn) => (-jn, id) }
      .take(k)
  }
}

class JoinabilityUnitSpec extends AnyFunSuite {
  test("equiJn counts containment normalized by |Q|") {
    assert(Joinability.equiJn(Seq("a", "b", "c", "d"), Seq("b", "d", "x")) == 0.5)
  }
  test("equiJn of an empty query is 0") {
    assert(Joinability.equiJn(Seq.empty, Seq("a")) == 0.0)
  }
  test("equiJn is 1 for a subset query") {
    assert(Joinability.equiJn(Seq("a", "b"), Seq("a", "b", "c")) == 1.0)
  }
  test("equiJn is asymmetric") {
    val a = Seq("a", "b"); val b = Seq("a", "b", "c", "d")
    assert(Joinability.equiJn(a, b) != Joinability.equiJn(b, a))
  }
  test("semanticJn matches identical vectors") {
    val ce = CellEmbedder.default
    val q = ce.embedColumn(Seq("alpha", "beta"))
    assert(Joinability.semanticJn(q, q, tau = 0.1) == 1.0)
  }
  test("semanticJn with tau 0 only matches identical cells") {
    val ce = CellEmbedder.default
    val q = ce.embedColumn(Seq("alpha", "beta"))
    val x = ce.embedColumn(Seq("alpha", "gamma"))
    assert(Joinability.semanticJn(q, x, tau = 1e-6) == 0.5)
  }
  test("semanticJn is at least equiJn for string-rendered columns") {
    val q = Seq("alpha", "beta", "gamma")
    val x = Seq("alpha", "betaa", "delta") // one exact + one near match
    val ce = CellEmbedder.default
    val sem = Joinability.semanticJn(ce.embedColumn(q), ce.embedColumn(x), 0.9)
    assert(sem >= Joinability.equiJn(q, x))
  }
}

class JoinabilitySparkSpec extends SparkSpec {
  import JoinFixtures._

  test("equiTopK matches brute force for every query") {
    import spark.implicits._
    val qDs = spark.createDataset(queries)
    val rDs = spark.createDataset(repo)
    val got = Joinability.equiTopKMap(spark, qDs, rDs, 10)
    queries.foreach { q =>
      val exp = bruteEquiTopK(q.cells, 10).map(_._1)
      assert(got.getOrElse(q.id, Seq.empty).map(_._1) == exp, s"query ${q.id}")
    }
  }
  test("equiTopK jn values are correct") {
    import spark.implicits._
    val got = Joinability.equiTopKMap(spark,
      spark.createDataset(queries), spark.createDataset(repo), 5)
    queries.foreach { q =>
      got.getOrElse(q.id, Seq.empty).foreach { case (id, jn) =>
        val x = repo.find(_.id == id).get
        assert(math.abs(jn - Joinability.equiJn(q.cells, x.cells)) < 1e-9)
      }
    }
  }
  test("equi overlap counts agree with DuckDB") {
    import spark.implicits._
    import org.apache.spark.sql.functions._
    val q = queries.head
    val qDf = spark.createDataset(Seq(q)).select(explode($"cells").as("cell"))
    val rDf = spark.createDataset(repo.take(100))
      .select($"id", explode($"cells").as("cell"))
    val overlap = qDf.join(rDf, "cell").groupBy($"id").agg(count(lit(1)).as("ov"))
      .select($"id".cast("string").as("id"), $"ov".cast("string").as("ov"))
    repro.Oracle.assertEquivalent(
      overlap,
      "SELECT r.id AS id, CAST(COUNT(*) AS VARCHAR) AS ov FROM q JOIN r ON q.cell = r.cell GROUP BY r.id",
      "q" -> qDf.select($"cell".cast("string").as("cell")),
      "r" -> rDf.select($"id".cast("string").as("id"), $"cell".cast("string").as("cell")))
  }
  test("equiSelfJoin finds exactly the pairs above the threshold") {
    import spark.implicits._
    val cols = repo.take(120)
    val ds = spark.createDataset(cols)
    val got = Joinability.equiSelfJoin(spark, ds, 0.5).as[(Long, Long, Double)]
      .collect().map(p => (p._1, p._2)).toSet
    val exp = (for {
      a <- cols; b <- cols if a.id != b.id
      jn = Joinability.equiJn(a.cells, b.cells) if jn >= 0.5
    } yield (a.id, b.id)).toSet
    assert(got == exp)
  }
}

class JosieSpec extends AnyFunSuite {
  import JoinFixtures._
  private lazy val josie = Josie.build(repo.map(c => (c.id, c.cells)))

  test("topK equals brute force on all queries (k=10)") {
    queries.foreach { q =>
      assert(josie.topK(q.cells, 10) == bruteEquiTopK(q.cells, 10), s"query ${q.id}")
    }
  }
  test("topK equals brute force for k=1 and k=50") {
    queries.take(4).foreach { q =>
      assert(josie.topK(q.cells, 1) == bruteEquiTopK(q.cells, 1))
      assert(josie.topK(q.cells, 50) == bruteEquiTopK(q.cells, 50))
    }
  }
  test("repository columns are their own best match") {
    repo.take(10).foreach { c =>
      val top = josie.topK(c.cells, 1)
      assert(top.head._2 == 1.0)
    }
  }
  test("unknown tokens yield no results") {
    assert(josie.topK(Seq("zzz-unseen-1", "zzz-unseen-2"), 5).isEmpty)
  }
  test("empty query yields no results") {
    assert(josie.topK(Seq.empty, 5).isEmpty)
  }
  test("jn values are normalized by the distinct query size") {
    val q = Seq("a", "a") ++ repo.head.cells.take(3) // duplicate cell
    val res = josie.topK(q, 3)
    assert(res.forall(_._2 <= 1.0))
    val distinctSize = q.distinct.size
    res.foreach { case (id, jn) =>
      val ov = math.round(jn * distinctSize)
      assert(math.abs(jn - ov.toDouble / distinctSize) < 1e-9)
    }
  }
  test("results are sorted by jn desc then id asc") {
    val res = josie.topK(queries.head.cells, 20)
    val sorted = res.sortBy { case (id, jn) => (-jn, id) }
    assert(res == sorted)
  }
  test("consecutive queries are independent (state reset)") {
    val q = queries.head
    val first = josie.topK(q.cells, 10)
    val second = josie.topK(q.cells, 10)
    assert(first == second)
  }
}

class LshEnsembleSpec extends AnyFunSuite {
  import JoinFixtures._
  private lazy val lsh = LshEnsemble.build(repo.map(c => (c.id, c.cells)))

  test("MinHash jaccard estimate is close to the true jaccard") {
    val mh = new MinHash(sig = 128)
    val a = (0 until 100).map(i => s"t$i")
    val b = (50 until 150).map(i => s"t$i") // true J = 50/150 = 1/3
    val est = mh.jaccard(mh.signature(a), mh.signature(b))
    assert(math.abs(est - 1.0 / 3) < 0.12, s"estimate $est")
  }
  test("MinHash of identical sets agrees on all slots") {
    val mh = new MinHash()
    val s = Seq("x", "y", "z")
    assert(mh.jaccard(mh.signature(s), mh.signature(s)) == 1.0)
  }
  test("MinHash signature is order-insensitive") {
    val mh = new MinHash()
    assert(mh.signature(Seq("a", "b", "c")).toSeq == mh.signature(Seq("c", "a", "b")).toSeq)
  }
  test("numColumns counts the repository") {
    assert(lsh.numColumns == repo.size)
  }
  test("topK returns at most k results with estimates in [0, 1]") {
    val res = lsh.topK(queries.head.cells, 10)
    assert(res.size <= 10)
    assert(res.forall { case (_, c) => c >= 0.0 && c <= 1.0 })
  }
  test("a repository column retrieves itself in its top results") {
    val c = repo(5)
    val res = lsh.topK(c.cells, 10)
    assert(res.map(_._1).contains(c.id))
  }
  test("approximate precision@10 is above random but below exact") {
    val hits = queries.map { q =>
      val exact = bruteEquiTopK(q.cells, 10).map(_._1).toSet
      if (exact.isEmpty) 1.0
      else lsh.topK(q.cells, 10).map(_._1).count(exact.contains).toDouble /
        math.min(10, exact.size)
    }
    val p = hits.sum / hits.size
    assert(p > 0.15 && p < 1.0, s"precision $p")
  }
  test("empty query returns nothing") {
    assert(lsh.topK(Seq.empty, 5).isEmpty)
  }
}

class PexesoSpec extends AnyFunSuite {
  import JoinFixtures._
  private lazy val px = Pexeso.build(repo.map(c => (c.id, c.cells)))

  test("topK equals brute force at tau=0.9 (pivot filter is safe)") {
    queries.take(5).foreach { q =>
      val got = px.topK(q.cells, 0.9, 10)
      val exp = bruteSemTopK(q.cells, 0.9, 10)
      assert(got == exp, s"query ${q.id}")
    }
  }
  test("topK equals brute force at tau=0.7") {
    queries.take(3).foreach { q =>
      assert(px.topK(q.cells, 0.7, 10) == bruteSemTopK(q.cells, 0.7, 10))
    }
  }
  test("a repository column is its own perfect match") {
    repo.take(5).foreach { c =>
      val top = px.topK(c.cells, 0.5, 1)
      assert(top.head._2 == 1.0)
    }
  }
  test("larger tau never reduces jn for a fixed pair") {
    val q = queries.head
    val ids = repo.take(20).map(_.id)
    val lo = px.jnMap(q.cells, 0.7, ids)
    val hi = px.jnMap(q.cells, 0.9, ids)
    ids.foreach(id => assert(hi(id) >= lo(id)))
  }
  test("jnOf agrees with Joinability.semanticJn") {
    val ce = CellEmbedder.default
    val q = queries.head
    repo.take(10).foreach { x =>
      val direct = Joinability.semanticJn(
        ce.embedColumn(q.cells), ce.embedColumn(x.cells), 0.9)
      assert(math.abs(px.jnOf(q.cells, 0.9, x.id) - direct) < 1e-9)
    }
  }
  test("jnOf of an unknown column id is 0") {
    assert(px.jnOf(queries.head.cells, 0.9, 999999L) == 0.0)
  }
  test("empty query returns no results") {
    assert(px.topK(Seq.empty, 0.9, 5).isEmpty)
  }
}

class PexesoSelfJoinSpec extends SparkSpec {
  import JoinFixtures._

  test("semanticSelfJoin matches pairwise computation") {
    val cols = repo.take(60)
    val got = Pexeso.semanticSelfJoin(spark, cols, tau = 0.9, t = 0.6)
      .map(p => (p._1, p._2)).toSet
    val ce = CellEmbedder.default
    val vecs = cols.map(c => c.id -> ce.embedColumn(c.cells)).toMap
    val exp = (for {
      a <- cols; b <- cols if a.id != b.id
      jn = Joinability.semanticJn(vecs(a.id), vecs(b.id), 0.9) if jn >= 0.6
    } yield (a.id, b.id)).toSet
    assert(got == exp)
  }
  test("semanticSelfJoin returns jn values above the threshold") {
    val cols = repo.take(40)
    Pexeso.semanticSelfJoin(spark, cols, 0.9, 0.5).foreach { case (_, _, jn) =>
      assert(jn >= 0.5 && jn <= 1.0)
    }
  }
}
