package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench._
import repro.embed._
import repro.lake._
import repro.text.{Contextualizer, TextOption}

/** Focused semantic-join calibration (scratch; not part of the tables). */
object FocusSem {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder().master("local[*]").appName("focus-sem")
      .config("spark.sql.shuffle.partitions", "64")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    spark.sparkContext.setLogLevel("WARN")

    val cfg = LakeConfig.webtable()
    val c = World.corpus(spark, cfg, nRepo = 2000, nTrain = 1000, nQuery = 10)
    val k = 10
    val jt = Semantic(0.9)
    val exSem = World.exactSemantic(spark, c, 0.9, k)

    def p10(emb: ColumnEmbedder): Double = {
      val idx = World.index(spark, c, emb)
      val res = World.retrieveAll(idx, c.queries, k)
      World.evalRetrieval(c, jt, res, exSem, Seq(k))(k)._1
    }
    val ctxBest = new Contextualizer(TextOption.default, frequency = c.cellFrequency)
    println(f"   P@10sem fastText       = ${p10(new FastTextEmbedder())}%.3f")
    println(f"   P@10sem MPNet raw best = ${p10(new PlmEmbedder(PlmConfig.mpnet, ctxBest))}%.3f")
    // Raw config probes under the semantic ground truth.
    for (pos <- Seq(0.0, 0.06, 0.12)) {
      val cfgP = PlmConfig.mpnet.copy(posSensitivity = pos)
      println(f"   P@10sem MPNet raw pos=$pos = ${p10(new PlmEmbedder(cfgP, ctxBest))}%.3f")
    }
    val dj = World.trainDeepJoin(spark, c, jt, PlmConfig.mpnet,
      TextOption.default, epochs = 2, loss = "mnr", headKind = "diag", lr = 2e-3)
    println(f"   P@10sem DeepJoin-MPNet(diag,mnr,e=2) = ${p10(dj)}%.3f")
    // Equi check with the regression loss too.
    val exEq = World.exactEqui(spark, c, k)
    def p10Eq(emb: ColumnEmbedder): Double = {
      val idx = World.index(spark, c, emb)
      val res = World.retrieveAll(idx, c.queries, k)
      World.evalRetrieval(c, Equi, res, exEq, Seq(k))(k)._1
    }
    println(f"   P@10equi fastText       = ${p10Eq(new FastTextEmbedder())}%.3f")
    println(f"   P@10equi MPNet raw best = ${p10Eq(new PlmEmbedder(PlmConfig.mpnet, ctxBest))}%.3f")
    val djE = World.trainDeepJoin(spark, c, Equi, PlmConfig.mpnet,
      TextOption.default, epochs = 2, loss = "mnr", headKind = "diag", lr = 2e-3)
    println(f"   P@10equi DeepJoin-MPNet(diag,mnr,e=2) = ${p10Eq(djE)}%.3f")
    spark.stop()
  }
}
