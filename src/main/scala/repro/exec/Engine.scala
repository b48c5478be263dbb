package repro.exec

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core._
import repro.core.Analysis.Catalog
import repro.ucrpq.Query2Mu

/** Full engine configuration: which logical rewrites are allowed and
  * which physical fixpoint plans may be chosen. The baseline systems of
  * the paper are modeled as restricted configurations (see DESIGN.md §2).
  */
final case class EngineConfig(
    name: String = "Dist-mu-RA",
    rewrite: RewriteConfig = RewriteConfig.all,
    plan: PlanChoice = PlanChoice.Auto,
    nPartitions: Int = 16,
    maxIters: Int = 100000,
    collectStats: Boolean = true,
    semiNaive: Boolean = true,
)

/** The Dist-μ-RA pipeline of Fig. 3: Query2Mu → MuRewriter →
  * CostEstimator → PhysicalPlanGenerator → distributed execution.
  */
final class MuRaEngine(val spark: SparkSession,
                       val catalog: Map[String, DataFrame],
                       val constants: Map[String, Any],
                       val cfg: EngineConfig) {

  val cat: Catalog = catalog.map { case (n, df) => n -> df.columns.toSet }

  /** Base-relation statistics for the cost model (row counts + per-column
    * approximate distinct counts), gathered once per dataset.
    */
  lazy val stats: Map[String, RelStats] =
    if (!cfg.collectStats) catalog.map { case (n, _) => n -> RelStats(1000.0, Map.empty) }
    else catalog.map { case (n, df) =>
      val cols = df.columns
      val aggs = count(lit(1)).as("__rows") +: cols.map(c => approx_count_distinct(col(c)).as(c))
      val row = df.agg(aggs.head, aggs.tail: _*).head()
      val rows = row.getLong(0).toDouble
      n -> RelStats(rows, cols.zipWithIndex.map { case (c, i) => c -> row.getLong(i + 1).toDouble }.toMap)
    }

  /** Check F_cond + sorts, explore the plan space with the configured
    * rules, and return the cost-optimal logical plan.
    */
  def optimize(t: Term): Term = {
    Analysis.checkFcond(t)
    Analysis.sort(t, cat) // type check
    // Cost-guided best-first exploration: cheap (well-rewritten) plans are
    // expanded first, so deep rewrite chains are found within the budget.
    val candidates = Rewriter.explore(t, cat, cfg.rewrite,
      rank = p => Cost.estimate(p, stats, cat).cost)
    Cost.best(candidates, stats, cat)
  }

  def execConfig: ExecConfig =
    ExecConfig(cfg.plan, cfg.nPartitions, cfg.maxIters, semiNaive = cfg.semiNaive)

  /** Execute an (already optimized) plan. */
  def execute(plan: Term): DataFrame = {
    val df = new Executor(spark, catalog, execConfig).eval(plan)
    df.select(df.columns.sorted.map(col): _*)
  }

  def run(t: Term): DataFrame = execute(optimize(t))

  def runQuery(query: String): DataFrame =
    run(Query2Mu.translate(query, constants))

  /** The optimized plan for a query, for inspection/tests. */
  def plan(query: String): Term = optimize(Query2Mu.translate(query, constants))

  /** Force base-relation statistics collection (benchmarks call this
    * before timing so stats gathering — a once-per-dataset activity —
    * is not charged to the first query).
    */
  def warmup(): Unit = { val _ = stats }
}

/** Factory for the engine variants compared in the paper's evaluation. */
object Engines {
  def distMuRA(spark: SparkSession, catalog: Map[String, DataFrame],
               constants: Map[String, Any] = Map.empty, nPartitions: Int = 16): MuRaEngine =
    new MuRaEngine(spark, catalog, constants,
      EngineConfig("Dist-mu-RA", RewriteConfig.all, PlanChoice.Auto, nPartitions))

  /** Ablation: all fixpoints forced to the global-driver-loop plan. */
  def distMuRAGld(spark: SparkSession, catalog: Map[String, DataFrame],
                  constants: Map[String, Any] = Map.empty, nPartitions: Int = 16): MuRaEngine =
    new MuRaEngine(spark, catalog, constants,
      EngineConfig("Dist-mu-RA (P_gld)", RewriteConfig.all, PlanChoice.ForceGld, nPartitions))

  /** Fig. 7 variant: parallel local worker loops, SetRDD-style. */
  def distMuRAPlwS(spark: SparkSession, catalog: Map[String, DataFrame],
                   constants: Map[String, Any] = Map.empty, nPartitions: Int = 16): MuRaEngine =
    new MuRaEngine(spark, catalog, constants,
      EngineConfig("Dist-mu-RA (P_plw^s)", RewriteConfig.all, PlanChoice.ForcePlwS, nPartitions))

  /** Fig. 7 variant: parallel local worker loops on the per-worker RDBMS
    * (DuckDB substituting PostgreSQL).
    */
  def distMuRAPlwPg(spark: SparkSession, catalog: Map[String, DataFrame],
                    constants: Map[String, Any] = Map.empty, nPartitions: Int = 16): MuRaEngine =
    new MuRaEngine(spark, catalog, constants,
      EngineConfig("Dist-mu-RA (P_plw^pg)", RewriteConfig.all, PlanChoice.ForcePlwPg, nPartitions))

  /** BigDatalog-equivalent: semi-naive distributed Datalog with
    * Magic-sets-level optimization (pushes in the written direction only
    * — no fixpoint reversal, no fixpoint merging, Sec. VI) but with
    * decomposable plans (GPS ≈ stable-column P_plw).
    */
  def bigDatalogLite(spark: SparkSession, catalog: Map[String, DataFrame],
                     constants: Map[String, Any] = Map.empty, nPartitions: Int = 16): MuRaEngine =
    new MuRaEngine(spark, catalog, constants,
      EngineConfig("BigDatalog-lite", RewriteConfig.bigDatalogLite, PlanChoice.Auto, nPartitions))

  /** Myria-equivalent: evaluation of the query as written (no logical
    * optimization of recursion), no P_plw-style decomposed plan — every
    * recursion step communicates (Sec. VI) — and naive (non-differential)
    * iteration, modeling the engine's poorer scaling on large closures
    * (Figs. 12/14; see DESIGN.md §2).
    */
  def myriaLite(spark: SparkSession, catalog: Map[String, DataFrame],
                constants: Map[String, Any] = Map.empty, nPartitions: Int = 16): MuRaEngine =
    new MuRaEngine(spark, catalog, constants,
      EngineConfig("Myria-lite", RewriteConfig.none, PlanChoice.ForceGld, nPartitions,
        semiNaive = false))
}
