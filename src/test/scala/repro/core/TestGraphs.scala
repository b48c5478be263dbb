package repro.core

import scala.util.Random

/** Shared fixtures for core tests: the paper's running example (Fig. 2 /
  * Example 2), small random graphs, and brute-force reference
  * implementations of composition and transitive closure.
  */
object TestGraphs {

  /** Start edges S of Fig. 2. */
  val paperS: Set[(Long, Long)] =
    Set((1L, 2L), (1L, 4L), (10L, 11L), (10L, 13L))

  /** Edge relation E of Fig. 2, reconstructed to match the Example 2
    * fixpoint trace (X2 adds (1,3),(1,5),(10,5),(10,12); X3 adds
    * (1,6),(10,6)).
    */
  val paperE: Set[(Long, Long)] =
    paperS ++ Set((2L, 3L), (4L, 5L), (11L, 5L), (13L, 12L), (5L, 6L))

  def rel(edges: Set[(Long, Long)]): LocalRel =
    LocalRel(Vector(Cols.src, Cols.trg), edges.toVector.map { case (s, t) => Vector(s, t) })

  def labeledRel(triples: Set[(Long, String, Long)]): LocalRel =
    LocalRel(Vector(Cols.src, Cols.pred, Cols.trg),
      triples.toVector.map { case (s, p, t) => Vector(s, p, t) })

  def asPairs(r: LocalRel): Set[(Long, Long)] = {
    val si = r.colIdx(Cols.src); val ti = r.colIdx(Cols.trg)
    r.rows.map(row => (row(si).asInstanceOf[Long], row(ti).asInstanceOf[Long])).toSet
  }

  def pairsOf(r: LocalRel, c1: String, c2: String): Set[(Long, Long)] = {
    val i1 = r.colIdx(c1); val i2 = r.colIdx(c2)
    r.rows.map(row => (row(i1).asInstanceOf[Long], row(i2).asInstanceOf[Long])).toSet
  }

  def bruteCompose(a: Set[(Long, Long)], b: Set[(Long, Long)]): Set[(Long, Long)] =
    for ((x, m) <- a; (m2, y) <- b; if m == m2) yield (x, y)

  /** Transitive closure by iteration to a fixed point. */
  def bruteClosure(edges: Set[(Long, Long)]): Set[(Long, Long)] = {
    var acc = edges
    var changed = true
    while (changed) {
      val next = acc ++ bruteCompose(acc, edges)
      changed = next != acc
      acc = next
    }
    acc
  }

  /** Reachability-restricted closure: pairs of `bruteClosure(e)` starting
    * from `starts` base edges.
    */
  def bruteFrom(starts: Set[(Long, Long)], edges: Set[(Long, Long)]): Set[(Long, Long)] = {
    var acc = starts
    var changed = true
    while (changed) {
      val next = acc ++ bruteCompose(acc, edges)
      changed = next != acc
      acc = next
    }
    acc
  }

  def randEdges(n: Int, m0: Int, seed: Long): Set[(Long, Long)] = {
    val rnd = new Random(seed)
    val m = math.min(m0, n * (n - 1) / 2) // cap below the possible-edge count
    val out = scala.collection.mutable.LinkedHashSet.empty[(Long, Long)]
    while (out.size < m) {
      val a = rnd.nextInt(n).toLong + 1; val b = rnd.nextInt(n).toLong + 1
      if (a != b) out += ((a, b))
    }
    out.toSet
  }

  def randLabeled(n: Int, m: Int, labels: Seq[String], seed: Long): Set[(Long, String, Long)] = {
    val rnd = new Random(seed)
    val out = scala.collection.mutable.LinkedHashSet.empty[(Long, String, Long)]
    while (out.size < m) {
      val a = rnd.nextInt(n).toLong + 1; val b = rnd.nextInt(n).toLong + 1
      if (a != b) out += ((a, labels(rnd.nextInt(labels.size)), b))
    }
    out.toSet
  }

  /** Catalog for terms over E(src,trg), S(src,trg) and G(src,pred,trg). */
  val cat: Analysis.Catalog = Map(
    "E" -> Set(Cols.src, Cols.trg),
    "S" -> Set(Cols.src, Cols.trg),
    "R" -> Set(Cols.src, Cols.trg),
    "G" -> Set(Cols.src, Cols.pred, Cols.trg))

  /** The Example 2 fixpoint term: μ(X = S ∪ π̃_c(ρ_dst^c(X) ⋈ ρ_src^c(E))). */
  def example2: Fix = {
    val step = AntiProj("c", Join(Rename(Cols.trg, "c", RecVar("X")), Rename(Cols.src, "c", Rel("E"))))
    Fix("X", Union(Rel("S"), step))
  }

  /** Pure closure E+ in right-appending form. */
  def closureE: Fix = Term.closure(Rel("E"), "X").asInstanceOf[Fix]
}
