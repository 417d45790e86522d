package repro.bench

import repro.SparkSpec

/** One bench suite per evaluation table; each prints the reproduced rows
  * (recorded next to the paper's numbers in EXPERIMENTS.md).
  */
class Table02DatasetStatsBench extends SparkSpec {
  test("Table 2: dataset statistics") {
    StatsAndExpertBench.table2(spark)
  }
}

class Table03EquiAccuracyBench extends SparkSpec {
  test("Table 3: accuracy of equi-joins") {
    AccuracyBench.table3(spark)
  }
}

class Table04to06SemanticAccuracyBench extends SparkSpec {
  test("Tables 4-6: accuracy of semantic joins, tau in {0.9, 0.8, 0.7}") {
    AccuracyBench.tables4to6(spark)
  }
}

class Table07ExpertEvalBench extends SparkSpec {
  test("Table 7: accuracy of semantic joins labeled by experts") {
    StatsAndExpertBench.table7(spark)
  }
}

class Table08ColumnSizeAccuracyBench extends SparkSpec {
  test("Table 8: accuracy, varying column size, webtable, k=10") {
    AccuracyBench.table8(spark)
  }
}

class Table09to10ContextualizationBench extends SparkSpec {
  test("Tables 9-10: evaluation of column-to-text transformation") {
    AccuracyBench.tables9to10(spark)
  }
}

class Table11to12ShuffleBench extends SparkSpec {
  test("Tables 11-12: evaluation of cell shuffle") {
    AccuracyBench.tables11to12(spark)
  }
}

class Table13ScalingBench extends SparkSpec {
  test("Table 13: processing time per query, varying |X|, k=10") {
    TimingBench.table13(spark)
  }
}

class Table14VaryKBench extends SparkSpec {
  test("Table 14: processing time per query, varying k") {
    TimingBench.table14(spark)
  }
}

class Table15ColumnSizeTimeBench extends SparkSpec {
  test("Table 15: processing time per query, varying column size") {
    TimingBench.table15(spark)
  }
}
