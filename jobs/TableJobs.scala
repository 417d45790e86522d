package repro.jobs

import repro.bench._

/** spark-submit entrypoints, one per evaluation table of the paper.
  * Usage: spark-submit --class repro.jobs.Table03EquiAccuracy <jar>
  */
object Table02DatasetStats {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("table02")
    StatsAndExpertBench.table2(spark); spark.stop()
  }
}

object Table03EquiAccuracy {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("table03")
    AccuracyBench.table3(spark); spark.stop()
  }
}

object Table0456SemanticAccuracy {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("table04-06")
    AccuracyBench.tables4to6(spark); spark.stop()
  }
}

object Table07ExpertEval {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("table07")
    StatsAndExpertBench.table7(spark); spark.stop()
  }
}

object Table08ColumnSize {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("table08")
    AccuracyBench.table8(spark); spark.stop()
  }
}

object Table0910Contextualization {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("table09-10")
    AccuracyBench.tables9to10(spark); spark.stop()
  }
}

object Table1112Shuffle {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("table11-12")
    AccuracyBench.tables11to12(spark); spark.stop()
  }
}

object Table13Scaling {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("table13")
    TimingBench.table13(spark); spark.stop()
  }
}

object Table14VaryK {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("table14")
    TimingBench.table14(spark); spark.stop()
  }
}

object Table15ColumnSizeTime {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("table15")
    TimingBench.table15(spark); spark.stop()
  }
}
