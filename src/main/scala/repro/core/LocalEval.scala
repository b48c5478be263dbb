package repro.core

import scala.collection.mutable

/** A small in-memory relation: a column ordering plus a set of rows.
  * Rows are `Vector[Any]` so they hash structurally (set semantics).
  */
final case class LocalRel(cols: Vector[String], rows: Vector[Vector[Any]]) {
  def colIdx(c: String): Int = {
    val i = cols.indexOf(c)
    if (i < 0) throw MuRaError(s"column $c not in $cols")
    i
  }

  /** Reorder rows to the given column ordering (same column set). */
  def aligned(order: Vector[String]): LocalRel =
    if (order == cols) this
    else {
      val idx = order.map(colIdx)
      LocalRel(order, rows.map(r => idx.map(r)))
    }

  def distinct: LocalRel = LocalRel(cols, rows.distinct)
  def isEmpty: Boolean = rows.isEmpty
  def size: Int = rows.size
}

object LocalRel {
  def empty(cols: Vector[String]): LocalRel = LocalRel(cols, Vector.empty)
}

/** Single-threaded semi-naive μ-RA evaluation over [[LocalRel]]s.
  *
  * This is the engine each worker runs in the `P_plw^s` physical plan:
  * joins against broadcast relations are hash joins, union/difference are
  * plain set operations on the partition-local set (the partition-wise
  * SetRDD semantics of Sec. IV-B), and fixpoints iterate Algorithm 1 on
  * the partition's own constant part. It doubles as the reference
  * evaluator in unit tests.
  */
object LocalEval {

  /** Evaluate a term. `env` binds base relations, `rec` bound recursive
    * variables. The result is deduplicated (set semantics).
    */
  def eval(t: Term, env: Map[String, LocalRel],
           rec: Map[String, LocalRel] = Map.empty,
           maxIters: Int = 1_000_000): LocalRel = t match {
    case Rel(n) => env.getOrElse(n, throw MuRaError(s"unbound relation $n"))
    case RecVar(x) => rec.getOrElse(x, throw MuRaError(s"unbound recursive variable $x"))

    case Filter(EqConst(c, v), s) =>
      val r = eval(s, env, rec, maxIters)
      val i = r.colIdx(c)
      LocalRel(r.cols, r.rows.filter(_(i) == v))

    case Filter(EqCols(a, b), s) =>
      val r = eval(s, env, rec, maxIters)
      val ia = r.colIdx(a); val ib = r.colIdx(b)
      LocalRel(r.cols, r.rows.filter(row => row(ia) == row(ib)))

    case Join(l, r) =>
      val lr = eval(l, env, rec, maxIters)
      val rr = eval(r, env, rec, maxIters)
      join(lr, rr)

    case Antijoin(l, r) =>
      val lr = eval(l, env, rec, maxIters)
      val rr = eval(r, env, rec, maxIters)
      antijoin(lr, rr)

    case Union(l, r) =>
      val lr = eval(l, env, rec, maxIters)
      val rr = eval(r, env, rec, maxIters).aligned(lr.cols)
      LocalRel(lr.cols, (lr.rows ++ rr.rows).distinct)

    case AntiProj(c, s) =>
      val r = eval(s, env, rec, maxIters)
      val i = r.colIdx(c)
      LocalRel(r.cols.patch(i, Nil, 1), r.rows.map(row => row.patch(i, Nil, 1)).distinct)

    case Rename(f, to, s) =>
      val r = eval(s, env, rec, maxIters)
      val i = r.colIdx(f)
      if (r.cols.contains(to)) throw MuRaError(s"rename target $to already present in ${r.cols}")
      LocalRel(r.cols.updated(i, to), r.rows)

    case Fix(x, body) =>
      val branches = Term.unionBranches(body)
      val (varB, constB) = branches.partition(_.usesRec(x))
      if (constB.isEmpty) throw MuRaError(s"fixpoint without constant part: ${t.pretty}")
      val r0 = constB.map(eval(_, env, rec, maxIters)).reduceLeft { (a, b) =>
        LocalRel(a.cols, (a.rows ++ b.aligned(a.cols).rows).distinct)
      }
      val phi = if (varB.isEmpty) None else Some(Term.unionAll(varB))
      phi match {
        case None => r0.distinct
        case Some(p) => fixpoint(x, r0.distinct, p, env, rec, maxIters)
      }
  }

  /** Semi-naive loop (Algorithm 1 of the paper): apply φ to the new
    * tuples only, which is sound under F_cond by Proposition 1.
    */
  def fixpoint(x: String, r0: LocalRel, phi: Term,
               env: Map[String, LocalRel], rec: Map[String, LocalRel],
               maxIters: Int): LocalRel = {
    val cols = r0.cols
    val total = mutable.LinkedHashSet.empty[Vector[Any]]
    total ++= r0.rows
    var delta = r0
    var iters = 0
    while (delta.rows.nonEmpty) {
      if (Thread.interrupted()) throw new InterruptedException("fixpoint cancelled")
      iters += 1
      if (iters > maxIters) throw MuRaError(s"fixpoint exceeded $maxIters iterations")
      val produced = eval(phi, env, rec + (x -> delta), maxIters).aligned(cols)
      val fresh = produced.rows.filterNot(total.contains)
      total ++= fresh
      delta = LocalRel(cols, fresh)
    }
    LocalRel(cols, total.toVector)
  }

  /** Hash natural join; cartesian product when no common columns. */
  def join(l: LocalRel, r: LocalRel): LocalRel = {
    val common = l.cols.filter(r.cols.contains)
    val rExtraIdx = r.cols.zipWithIndex.collect { case (c, i) if !common.contains(c) => i }
    val outCols = l.cols ++ rExtraIdx.map(r.cols)
    if (common.isEmpty) {
      LocalRel(outCols, for (a <- l.rows; b <- r.rows) yield a ++ b)
    } else {
      val lKey = common.map(l.colIdx)
      val rKey = common.map(r.colIdx)
      val index = mutable.HashMap.empty[Vector[Any], mutable.ArrayBuffer[Vector[Any]]]
      r.rows.foreach { row =>
        index.getOrElseUpdate(rKey.map(row), mutable.ArrayBuffer.empty) += row
      }
      val out = Vector.newBuilder[Vector[Any]]
      l.rows.foreach { a =>
        index.get(lKey.map(a)).foreach { bs =>
          bs.foreach(b => out += (a ++ rExtraIdx.map(b)))
        }
      }
      LocalRel(outCols, out.result())
    }
  }

  /** Hash anti-join on common columns; `l ▷ r = l` when r is empty and
    * there are no common columns, ∅ otherwise.
    */
  def antijoin(l: LocalRel, r: LocalRel): LocalRel = {
    val common = l.cols.filter(r.cols.contains)
    if (common.isEmpty) {
      if (r.rows.isEmpty) l else LocalRel(l.cols, Vector.empty)
    } else {
      val lKey = common.map(l.colIdx)
      val rKey = common.map(r.colIdx)
      val keys = r.rows.iterator.map(rKey.map(_)).toSet
      LocalRel(l.cols, l.rows.filterNot(a => keys.contains(lKey.map(a))))
    }
  }
}
