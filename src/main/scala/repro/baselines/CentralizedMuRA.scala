package repro.baselines

import java.sql.DriverManager
import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.types._
import repro.core._
import repro.exec.{EngineConfig, MuRaEngine, PlanChoice, SqlGen}
import repro.ucrpq.Query2Mu

/** Centralized μ-RA baseline ([11]): the same logical optimizations as
  * Dist-μ-RA, executed on a single-node RDBMS via `WITH RECURSIVE`.
  * Substitution: DuckDB (in-process) instead of PostgreSQL — identical
  * recursive-CTE set semantics (see DESIGN.md §2).
  */
final class CentralizedMuRA(spark: SparkSession,
                            catalog: Map[String, DataFrame],
                            constants: Map[String, Any]) {

  val name = "Centralized mu-RA"

  private val planner = new MuRaEngine(spark, catalog, constants,
    EngineConfig("centralized-planner", RewriteConfig.all, PlanChoice.ForceGld))

  /** Force planner statistics collection before timing (see MuRaEngine). */
  def warmup(): Unit = planner.warmup()

  def run(t: Term): DataFrame = {
    val best = planner.optimize(t)
    val relNames = best.freeRels.toSeq.sorted
    val gen = new SqlGen(
      relTable = relNames.map(n => n -> s"rel_${n.replaceAll("[^A-Za-z0-9_]", "_")}").toMap,
      relCols = relNames.map(n => n -> catalog(n).columns.toSeq).toMap)
    val (sql, cols) = gen.select(best, Map.empty)
    Class.forName("org.duckdb.DuckDBDriver")
    val conn = DriverManager.getConnection("jdbc:duckdb:")
    try {
      relNames.foreach { n =>
        val df = catalog(n)
        val ddl = df.schema.fields
          .map(f => s""""${f.name}" ${duckType(f.dataType)}""").mkString(", ")
        val table = s"rel_${n.replaceAll("[^A-Za-z0-9_]", "_")}"
        conn.createStatement.execute(s"CREATE TABLE $table ($ddl)")
        val ps = conn.prepareStatement(
          s"INSERT INTO $table VALUES (${df.columns.map(_ => "?").mkString(",")})")
        df.collect().foreach { r =>
          r.toSeq.zipWithIndex.foreach { case (v, i) => ps.setObject(i + 1, v) }
          ps.addBatch()
        }
        ps.executeBatch(); ps.close()
      }
      val rs = conn.createStatement.executeQuery(s"SELECT DISTINCT * FROM ($sql) AS q")
      val meta = rs.getMetaData
      val fields = (1 to meta.getColumnCount).map { i =>
        val dt = meta.getColumnTypeName(i).toUpperCase match {
          case "BIGINT" | "HUGEINT"      => LongType
          case "INTEGER" | "INT" | "INT4" => IntegerType
          case "DOUBLE"                   => DoubleType
          case _                          => StringType
        }
        StructField(meta.getColumnLabel(i), dt)
      }
      val buf = Vector.newBuilder[Row]
      while (rs.next()) {
        buf += Row.fromSeq(fields.indices.map { i =>
          (fields(i).dataType, rs.getObject(i + 1)) match {
            case (LongType, v: Number)    => v.longValue()
            case (IntegerType, v: Number) => v.intValue()
            case (DoubleType, v: Number)  => v.doubleValue()
            case (_, null)                => null
            case (StringType, v)          => v.toString
            case (_, v)                   => v
          }
        })
      }
      val df = spark.createDataFrame(
        spark.sparkContext.parallelize(buf.result(), 1), StructType(fields))
      df.select(cols.map(org.apache.spark.sql.functions.col): _*)
    } finally conn.close()
  }

  def runQuery(query: String): DataFrame =
    run(Query2Mu.translate(query, constants))

  private def duckType(dt: DataType): String = dt match {
    case LongType    => "BIGINT"
    case IntegerType => "INTEGER"
    case DoubleType  => "DOUBLE"
    case StringType  => "VARCHAR"
    case BooleanType => "BOOLEAN"
    case other       => throw MuRaError(s"unsupported type for RDBMS backend: $other")
  }
}
