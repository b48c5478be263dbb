package repro.exec

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.functions.{broadcast, col, lit}
import org.apache.spark.sql.types._
import java.sql.DriverManager
import repro.core._
import repro.core.Analysis.Catalog

/** Which physical plan to use for fixpoints (Sec. IV).
  *
  *  - [[PlanChoice.Auto]]: the paper's selection rule — if the fixpoint
  *    has a stable column, repartition the constant part by it and run
  *    `P_plw`; otherwise run `P_gld`.
  *  - The `Force*` choices pin a plan (used for the Fig. 7 / Fig. 9
  *    ablations).
  */
sealed trait PlanChoice
object PlanChoice {
  case object Auto extends PlanChoice
  case object ForceGld extends PlanChoice
  case object ForcePlwS extends PlanChoice
  case object ForcePlwPg extends PlanChoice
}

final case class ExecConfig(
    plan: PlanChoice = PlanChoice.Auto,
    nPartitions: Int = 16,
    maxIters: Int = 100000,
    /** Broadcast φ's constant relations in P_gld joins when known small. */
    broadcastThreshold: Long = 4000000L,
    /** Semi-naive (differential) iteration: φ applied to the new tuples
      * only (Algorithm 1). Disabled for the Myria-lite baseline to model
      * a less efficient recursion engine (see DESIGN.md §2).
      */
    semiNaive: Boolean = true,
)

/** Term → DataFrame evaluation. Non-recursive operators map directly to
  * Dataset operations (optimized by Catalyst, as in Sec. IV); fixpoints
  * dispatch to one of the physical plans below.
  */
final class Executor(spark: SparkSession, env: Map[String, DataFrame], cfg: ExecConfig) {

  private val cat: Catalog = env.map { case (n, df) => n -> df.columns.toSet }

  def eval(t: Term): DataFrame = evalRec(t, Map.empty)

  private def evalRec(t: Term, rec: Map[String, DataFrame]): DataFrame = t match {
    case Rel(n) => env.getOrElse(n, throw MuRaError(s"unbound relation $n"))
    case RecVar(x) => rec.getOrElse(x, throw MuRaError(s"unbound recursive variable $x"))
    case Filter(EqConst(c, v), s) => evalRec(s, rec).filter(col(c) === lit(v))
    case Filter(EqCols(a, b), s)  => evalRec(s, rec).filter(col(a) === col(b))
    case Join(l, r) =>
      val dl = evalRec(l, rec); val dr = evalRec(r, rec)
      val common = dl.columns.toSet intersect dr.columns.toSet
      if (common.isEmpty) dl.crossJoin(dr) else dl.join(dr, common.toSeq.sorted)
    case Antijoin(l, r) =>
      val dl = evalRec(l, rec); val dr = evalRec(r, rec)
      val common = dl.columns.toSet intersect dr.columns.toSet
      if (common.nonEmpty) dl.join(dr, common.toSeq.sorted, "left_anti")
      else if (dr.isEmpty) dl
      else dl.limit(0)
    case Union(l, r) =>
      evalRec(l, rec).unionByName(evalRec(r, rec)).distinct()
    case AntiProj(c, s) => evalRec(s, rec).drop(c).distinct()
    case Rename(f, to, s) => evalRec(s, rec).withColumnRenamed(f, to)
    case fix: Fix => evalFix(fix, rec)
  }

  // -------------------------------------------------------------------
  // Fixpoint dispatch (the PhysicalPlanGenerator of Sec. IV-B)
  // -------------------------------------------------------------------

  private def evalFix(fix: Fix, rec: Map[String, DataFrame]): DataFrame = {
    val fullCat = cat ++ rec.map { case (x, df) => s"__rec_$x" -> df.columns.toSet }
    val (constT, varB) = Analysis.decompose(fix, cat)
    val rDf = evalRec(constT, rec).distinct()
    if (varB.isEmpty) return rDf
    // Materialize constant subterms of φ that contain fixpoints so they
    // are computed once, not per iteration / per worker.
    val (phiBranches, hoisted) = hoistConstants(varB, fix.x, rec)
    val phi = Term.unionAll(phiBranches)
    val stable = Stabilizer.stableCols(fix, cat).toSeq.sorted
    val _ = fullCat
    cfg.plan match {
      case PlanChoice.Auto =>
        if (stable.nonEmpty) pPlwS(rDf, fix.x, phi, hoisted, stable, finalDistinct = false)
        else pGld(rDf, fix.x, phi, hoisted)
      case PlanChoice.ForceGld => pGld(rDf, fix.x, phi, hoisted)
      case PlanChoice.ForcePlwS =>
        pPlwS(rDf, fix.x, phi, hoisted, stable, finalDistinct = stable.isEmpty)
      case PlanChoice.ForcePlwPg =>
        pPlwPg(rDf, fix.x, phiBranches, hoisted, stable, finalDistinct = stable.isEmpty)
    }
  }

  /** Replace maximal constant subterms of φ that contain a fixpoint by
    * fresh relation names bound to materialized DataFrames.
    */
  private def hoistConstants(branches: List[Term], x: String,
                             rec: Map[String, DataFrame]): (List[Term], Map[String, DataFrame]) = {
    var extra = Map.empty[String, DataFrame]
    def containsFix(t: Term): Boolean = t match {
      case Fix(_, _)       => true
      case Rel(_) | RecVar(_) => false
      case Filter(_, s)    => containsFix(s)
      case AntiProj(_, s)  => containsFix(s)
      case Rename(_, _, s) => containsFix(s)
      case Join(l, r)      => containsFix(l) || containsFix(r)
      case Antijoin(l, r)  => containsFix(l) || containsFix(r)
      case Union(l, r)     => containsFix(l) || containsFix(r)
    }
    def go(t: Term): Term =
      if (!t.usesRec(x) && containsFix(t)) {
        val name = s"__hoist_${extra.size}"
        extra += name -> evalRec(t, rec).localCheckpoint(true)
        Rel(name)
      } else t match {
        case Filter(c, s)    => Filter(c, go(s))
        case AntiProj(c, s)  => AntiProj(c, go(s))
        case Rename(f, o, s) => Rename(f, o, go(s))
        case Join(l, r)      => Join(go(l), go(r))
        case Antijoin(l, r)  => Antijoin(go(l), go(r))
        case Union(l, r)     => Union(go(l), go(r))
        case other           => other
      }
    (branches.map(go), extra)
  }

  private def envWith(extra: Map[String, DataFrame]): Map[String, DataFrame] = env ++ extra

  // -------------------------------------------------------------------
  // P_gld: global loop on the driver (Sec. IV-A1, Algorithm 1)
  // -------------------------------------------------------------------

  /** Driver-side semi-naive loop over distributed Datasets. Every
    * iteration performs the distributed joins of φ plus a set-difference
    * and a union — each a shuffle across the cluster, which is exactly
    * the communication cost P_plw removes.
    */
  def pGld(rDf: DataFrame, x: String, phi: Term, extra: Map[String, DataFrame]): DataFrame = {
    val cols = rDf.columns.toSeq
    val e = envWith(extra)
    // φ's constant relations are identical across iterations; if small,
    // hint a broadcast join to avoid re-shuffling them each step.
    val relEnv: Map[String, DataFrame] = phi.freeRels.map { n =>
      val df = e(n)
      n -> df
    }.toMap
    val sub = new Executor(spark, relEnv, cfg)
    var total = rDf.localCheckpoint(true)
    var delta = total
    var iters = 0
    var done = false
    while (!done) {
      iters += 1
      if (iters > cfg.maxIters) throw MuRaError(s"P_gld exceeded ${cfg.maxIters} iterations")
      // Semi-naive applies φ to the delta only (Algorithm 1, sound by
      // Prop. 1); naive mode re-applies φ to the whole accumulated set.
      val input = if (cfg.semiNaive) delta else total
      val produced = sub.evalRec(phi, Map(x -> input)).select(cols.map(col): _*)
      val fresh = produced.except(total)
      val newDelta = fresh.localCheckpoint(true)
      if (newDelta.isEmpty) done = true
      else {
        val newTotal = total.union(newDelta).localCheckpoint(true)
        delta = newDelta
        total = newTotal
      }
    }
    total
  }

  // -------------------------------------------------------------------
  // P_plw^s: parallel local loops on the workers, SetRDD-style
  // (Sec. IV-A2 / IV-B)
  // -------------------------------------------------------------------

  /** Fixpoint splitting (Prop. 3): repartition the constant part — by the
    * stable column(s) when they exist (then the per-worker fixpoints are
    * provably disjoint and no final distinct is needed), by row hash
    * otherwise (then one final distinct merges the local results). Each
    * partition runs its own semi-naive loop against broadcast copies of
    * φ's constant relations: broadcast joins plus partition-wise
    * union/set-difference — the SetRDD technique of BigDatalog. No data
    * crosses the cluster during the recursion.
    */
  def pPlwS(rDf: DataFrame, x: String, phi: Term, extra: Map[String, DataFrame],
            stable: Seq[String], finalDistinct: Boolean): DataFrame = {
    val schema = rDf.schema
    val colsVec = schema.fieldNames.toVector
    val e = envWith(extra)
    val localRels: Map[String, LocalRel] = phi.freeRels.map { n =>
      val df = e(n)
      n -> LocalRel(df.columns.toVector, df.collect().toVector.map(r => r.toSeq.toVector))
    }.toMap
    val bc = spark.sparkContext.broadcast(localRels)
    val xName = x
    val phiSer = phi
    val maxIters = cfg.maxIters
    val parted =
      if (stable.nonEmpty) rDf.repartition(cfg.nPartitions, stable.map(col): _*)
      else rDf.repartition(cfg.nPartitions)
    val rowRdd = parted.rdd.mapPartitions { it =>
      val rows = it.map(_.toSeq.toVector).toVector.distinct
      if (rows.isEmpty) Iterator.empty
      else {
        val r0 = LocalRel(colsVec, rows)
        val res = LocalEval.fixpoint(xName, r0, phiSer, bc.value, Map.empty, maxIters)
        res.aligned(colsVec).rows.iterator.map(Row.fromSeq)
      }
    }
    val df = spark.createDataFrame(rowRdd, schema)
    if (finalDistinct) df.distinct() else df
  }

  // -------------------------------------------------------------------
  // P_plw^pg: parallel local loops inside a per-worker RDBMS
  // (substitution: DuckDB for PostgreSQL — see DESIGN.md)
  // -------------------------------------------------------------------

  /** Same partitioning as P_plw^s, but each worker loads its slice of the
    * constant part (the paper's per-worker PostgreSQL *view*) plus φ's
    * relations into an in-process DuckDB and runs the translated
    * `WITH RECURSIVE` query, streaming the result back as an iterator.
    */
  def pPlwPg(rDf: DataFrame, x: String, phiBranches: List[Term],
             extra: Map[String, DataFrame], stable: Seq[String],
             finalDistinct: Boolean): DataFrame = {
    val schema = rDf.schema
    val colsVec = schema.fieldNames.toVector
    val e = envWith(extra)
    val phi = Term.unionAll(phiBranches)
    val relNames = phi.freeRels.toSeq.sorted
    // keyed by the sanitized DuckDB table name: the task closure must not
    // capture `this` (it is not serializable)
    val relData: Map[String, (Vector[String], Vector[Vector[Any]], Vector[String])] =
      relNames.map { n =>
        val df = e(n)
        val types = df.schema.fields.map(f => duckType(f.dataType)).toVector
        (s"rel_${sanitize(n)}", (df.columns.toVector, df.collect().toVector.map(_.toSeq.toVector), types))
      }.toMap
    val gen = new SqlGen(
      relTable = relNames.map(n => n -> s"rel_${sanitize(n)}").toMap,
      relCols = relNames.map(n => n -> e(n).columns.toSeq).toMap)
    val fixSql = gen.localFixpointQuery(phiBranches, x, "part_r", colsVec)
    val partTypes = schema.fields.map(f => duckType(f.dataType)).toVector
    val bc = spark.sparkContext.broadcast(relData)
    val parted =
      if (stable.nonEmpty) rDf.repartition(cfg.nPartitions, stable.map(col): _*)
      else rDf.repartition(cfg.nPartitions)
    val outTypes = schema.fields.map(_.dataType).toVector
    val rowRdd = parted.rdd.mapPartitions { it =>
      val rows = it.map(_.toSeq.toVector).toVector
      if (rows.isEmpty) Iterator.empty
      else {
        Class.forName("org.duckdb.DuckDBDriver")
        val conn = DriverManager.getConnection("jdbc:duckdb:")
        try {
          def load(table: String, cols: Vector[String], types: Vector[String],
                   data: Vector[Vector[Any]]): Unit = {
            val ddlCols = cols.zip(types).map { case (c, ty) => s""""$c" $ty""" }.mkString(", ")
            conn.createStatement.execute(s"CREATE TABLE $table ($ddlCols)")
            val ps = conn.prepareStatement(
              s"INSERT INTO $table VALUES (${cols.map(_ => "?").mkString(",")})")
            data.foreach { r =>
              r.indices.foreach(i => ps.setObject(i + 1, r(i)))
              ps.addBatch()
            }
            ps.executeBatch(); ps.close()
          }
          bc.value.foreach { case (table, (cols, data, types)) =>
            load(table, cols, types, data)
          }
          load("part_r", colsVec, partTypes, rows)
          val rs = conn.createStatement.executeQuery(fixSql)
          val buf = Vector.newBuilder[Row]
          while (rs.next()) {
            buf += Row.fromSeq(colsVec.indices.map { i =>
              (outTypes(i), rs.getObject(i + 1)) match {
                case (LongType, v: Number)    => v.longValue()
                case (IntegerType, v: Number) => v.intValue()
                case (DoubleType, v: Number)  => v.doubleValue()
                case (_, v)                   => v
              }
            })
          }
          buf.result().iterator
        } finally conn.close()
      }
    }
    val df = spark.createDataFrame(rowRdd, schema)
    if (finalDistinct) df.distinct() else df
  }

  private def sanitize(n: String): String = n.replaceAll("[^A-Za-z0-9_]", "_")

  private def duckType(dt: DataType): String = dt match {
    case LongType    => "BIGINT"
    case IntegerType => "INTEGER"
    case DoubleType  => "DOUBLE"
    case StringType  => "VARCHAR"
    case BooleanType => "BOOLEAN"
    case other       => throw MuRaError(s"unsupported type for RDBMS backend: $other")
  }
}
