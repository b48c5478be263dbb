package repro.bench

import org.apache.spark.sql.{DataFrame, SparkSession}
import scala.concurrent.{Await, ExecutionContext, Future, TimeoutException}
import scala.concurrent.duration._
import java.util.concurrent.Executors

/** Benchmark harness: runs one engine invocation with a wall-clock
  * timeout (cancelling the Spark job group on expiry — the analogue of
  * the paper's 1000 s timeout in Fig. 9) and renders aligned text tables
  * for EXPERIMENTS.md.
  */
object Harness {

  /** One measurement: `timeMs` is None on timeout/failure (the paper
    * reports an absent bar when "the system has crashed").
    */
  final case class Measurement(system: String, qid: String,
                               timeMs: Option[Long], rows: Option[Long], note: String = "") {
    def cell: String = timeMs match {
      case Some(t) => f"${t / 1000.0}%.2f s"
      case None    => if (note.nonEmpty) note else "fail"
    }
  }

  private val pool = ExecutionContext.fromExecutorService(Executors.newCachedThreadPool())

  /** Default per-run timeout; the paper uses 1000 s on a 160-core
    * cluster — scaled down alongside the datasets.
    */
  def defaultTimeoutMs: Long = sys.env.getOrElse("BENCH_TIMEOUT_MS", "60000").toLong

  /** Execute `mk` (which must both build and *materialize* the result —
    * we call `.count()` on the returned DataFrame) under a timeout.
    */
  def timed(spark: SparkSession, system: String, qid: String,
            timeoutMs: Long = defaultTimeoutMs)(mk: => DataFrame): Measurement = {
    val group = s"bench-$system-$qid-${System.nanoTime()}"
    val fut = Future {
      spark.sparkContext.setJobGroup(group, s"$system/$qid", interruptOnCancel = true)
      val t0 = System.nanoTime()
      val rows = mk.count()
      val ms = (System.nanoTime() - t0) / 1000000
      (ms, rows)
    }(pool)
    try {
      val (ms, rows) = Await.result(fut, timeoutMs.millis)
      Measurement(system, qid, Some(ms), Some(rows))
    } catch {
      case _: TimeoutException =>
        spark.sparkContext.cancelJobGroup(group)
        Measurement(system, qid, None, None, "timeout")
      case e: Throwable =>
        spark.sparkContext.cancelJobGroup(group)
        Measurement(system, qid, None, None, s"fail(${rootCause(e).getClass.getSimpleName})")
    }
  }

  private def rootCause(e: Throwable): Throwable =
    if (e.getCause != null && e.getCause != e) rootCause(e.getCause) else e

  /** Render an aligned text table; also returned as a string so bench
    * suites can both print it and keep it in the test report.
    */
  def table(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(r => if (i < r.size) r(i).length else 0).max)
    def fmt(r: Seq[String]): String =
      r.zipWithIndex.map { case (c, i) => c.padTo(widths(i), ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    val sb = new StringBuilder
    sb.append(s"\n== $title ==\n")
    sb.append(fmt(header)).append('\n').append(sep).append('\n')
    rows.foreach(r => sb.append(fmt(r)).append('\n'))
    sb.toString()
  }

  /** Pivot measurements into a qid × system table. */
  def pivot(title: String, ms: Seq[Measurement], note: String = ""): String = {
    val systems = ms.map(_.system).distinct
    val qids = ms.map(_.qid).distinct
    val byKey = ms.map(m => (m.qid, m.system) -> m).toMap
    val rowsByQ = qids.map { q =>
      val cells = systems.map(s => byKey.get((q, s)).map(_.cell).getOrElse("-"))
      val rc = systems.flatMap(s => byKey.get((q, s)).flatMap(_.rows)).headOption
        .map(_.toString).getOrElse("-")
      q +: cells :+ rc
    }
    val t = table(title, "query" +: systems :+ "result rows", rowsByQ)
    if (note.nonEmpty) t + note + "\n" else t
  }
}
