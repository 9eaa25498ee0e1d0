package repro.bench

import repro.SparkSpec

/** Benchmark battery: one suite per reproduced table/figure. Each prints the
  * markdown table recorded in EXPERIMENTS.md. Scale via REPRO_QUERIES /
  * REPRO_TIMEOUT_MS / REPRO_FULL (see BenchUtil).
  */
class Table2DatasetsBench extends SparkSpec {
  test("Table 2: dataset inventory") {
    val report = Table2Datasets.run()
    println(report)
    assert(report.linesIterator.count(_.startsWith("| ")) >= 16) // header + 15 rows
  }
}

class Fig8PerformanceBench extends SparkSpec {
  test("Figure 8: EVE vs JOIN vs PathEnum total time") {
    val report = Fig8Performance.run(spark)
    println(report)
    assert(report.contains("EVE"))
    assert(Fig8Performance.datasetNames.forall(report.contains))
  }
}

class Table3RedundantBench extends SparkSpec {
  test("Table 3: redundant ratio of the upper-bound graph") {
    val report = Table3Redundant.run(spark)
    println(report)
    // every dataset present and all ratios parse (0 or small percentages)
    assert(report.linesIterator.count(_.startsWith("| ")) >= 16)
  }
}

class Table4SpeedupBench extends SparkSpec {
  test("Table 4: enumeration speedups with reduced search space") {
    val report = Table4Speedups.run(spark)
    println(report)
    assert(report.contains("KHSQ") && report.contains("KHSQ+") && report.contains("EVE"))
  }
}

class Table5SpgOnGstBench extends SparkSpec {
  test("Table 5: SPG generation on G^k_st") {
    val report = Table5SpgOnGst.run(spark)
    println(report)
    assert(report.contains("PathEnum") && report.contains("JOIN"))
  }
}

class Fig11AblationBench extends SparkSpec {
  test("Figure 11: pruning-strategy ablation at k=7") {
    val report = Fig11Ablation.run(spark)
    println(report)
    assert(Fig11Ablation.variants.map(_._1).forall(report.contains))
  }
}
