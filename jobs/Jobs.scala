package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.Experiments

/** spark-submit entrypoints, one per reproduced evaluation artifact.
  *
  * Example:
  *   spark-submit --class repro.jobs.Fig9Yago target/scala-2.13/repro_2.13-*.jar
  *
  * Dataset scales honor the same env knobs as the bench suites
  * (YAGO_SCALE, UNIPROT13_EDGES, BENCH_TIMEOUT_MS, …).
  */
object JobSession {
  def build(name: String): SparkSession = {
    val s = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    s.sparkContext.setLogLevel("WARN")
    s
  }

  def run(name: String)(f: SparkSession => String): Unit = {
    val spark = build(name)
    try println(f(spark)) finally spark.stop()
  }
}

/** Table I — dataset statistics (edges, nodes, TC size). */
object Table1DatasetStats {
  def main(args: Array[String]): Unit = JobSession.run("table1")(Experiments.table1)
}

/** Fig. 7 — P_plw^s vs P_plw^pg on Yago-lite. */
object Fig7PlwImpls {
  def main(args: Array[String]): Unit = JobSession.run("fig7")(Experiments.fig7)
}

/** Fig. 8 — scalability on uniprot-lite (3 sizes × 25 queries × 2 systems). */
object Fig8UniprotScale {
  def main(args: Array[String]): Unit = JobSession.run("fig8")(Experiments.fig8)
}

/** Fig. 9 — running times on Yago-lite (25 queries × 5 systems). */
object Fig9Yago {
  def main(args: Array[String]): Unit = JobSession.run("fig9")(Experiments.fig9)
}

/** Fig. 10 — concatenated closures a1+/…/an+, n = 2..10. */
object Fig10Concat {
  def main(args: Array[String]): Unit = JobSession.run("fig10")(Experiments.fig10)
}

/** Fig. 11 — general μ-RA terms (aⁿbⁿ, same generation, reach). */
object Fig11MuRaQueries {
  def main(args: Array[String]): Unit = JobSession.run("fig11")(Experiments.fig11)
}

/** Fig. 12 — same generation vs Myria-lite across tree sizes. */
object Fig12SameGen {
  def main(args: Array[String]): Unit = JobSession.run("fig12")(Experiments.fig12)
}

/** Figs. 13/14 — Uniprot query workload. */
object Fig13Uniprot {
  def main(args: Array[String]): Unit =
    JobSession.run("fig13")(s => Experiments.fig13(s) + "\n" + Experiments.fig14(s))
}
