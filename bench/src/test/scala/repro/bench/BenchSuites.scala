package repro.bench

import repro.SparkSpec

/** Benchmark suites, one per evaluation artifact of the paper. Each
  * prints the reproduced numbers table (captured into bench_output.txt;
  * paper-vs-measured is recorded in EXPERIMENTS.md). Per-run timeout:
  * BENCH_TIMEOUT_MS (default 60 s) — the analogue of the paper's 1000 s
  * timeout, scaled with the datasets.
  */
class Table1DatasetsBench extends SparkSpec {
  test("Table I — dataset statistics (edges, nodes, TC size)") {
    val out = Experiments.table1(spark)
    println(out)
    assert(out.contains("tree_10"))
  }
}

class Fig7PlwBench extends SparkSpec {
  test("Fig. 7 — P_plw^s vs P_plw^pg on Yago-lite") {
    val out = Experiments.fig7(spark)
    println(out)
    assert(out.contains("P_plw^s"))
  }
}

class Fig9YagoBench extends SparkSpec {
  test("Fig. 9 — running times on Yago-lite, 25 queries x 5 systems") {
    val out = Experiments.fig9(spark)
    println(out)
    assert(out.contains("Q25"))
  }
}

class Fig10ConcatBench extends SparkSpec {
  test("Fig. 10 — concatenated closures") {
    val out = Experiments.fig10(spark)
    println(out)
    assert(out.contains("n=10"))
  }
}

class Fig11MuRaBench extends SparkSpec {
  test("Fig. 11 — general μ-RA terms") {
    val out = Experiments.fig11(spark)
    println(out)
    assert(out.contains("same_generation"))
  }
}

class Fig12SameGenBench extends SparkSpec {
  test("Fig. 12 — same generation vs Myria-lite") {
    val out = Experiments.fig12(spark)
    println(out)
    assert(out.contains("Myria-lite"))
  }
}

class Fig13UniprotBench extends SparkSpec {
  test("Fig. 13 — Uniprot workload, 25 queries x 3 systems") {
    val out = Experiments.fig13(spark)
    println(out)
    assert(out.contains("Q50"))
  }
}

class Fig14UniprotMyriaBench extends SparkSpec {
  test("Fig. 14 — Myria-lite vs Dist-mu-RA on small uniprot-lite") {
    val out = Experiments.fig14(spark)
    println(out)
    assert(out.contains("Q50"))
  }
}

class Fig8ScaleBench extends SparkSpec {
  test("Fig. 8 — scalability on uniprot-lite (3 sizes)") {
    val out = Experiments.fig8(spark)
    println(out)
    assert(out.contains("Fig. 8"))
  }
}
