package repro.core

import org.scalatest.funsuite.AnyFunSuite
import TestGraphs._

/** The in-memory semi-naive evaluator against brute-force references. */
class LocalEvalSpec extends AnyFunSuite {

  private val env = Map("E" -> rel(paperE), "S" -> rel(paperS), "R" -> rel(paperE))

  test("base relation lookup") {
    assert(asPairs(LocalEval.eval(Rel("E"), env)) == paperE)
  }

  test("filter on constant") {
    val r = LocalEval.eval(Filter(EqConst("src", 1L), Rel("E")), env)
    assert(asPairs(r) == paperE.filter(_._1 == 1L))
  }

  test("filter on column equality") {
    val withLoop = rel(paperE + ((3L, 3L)))
    val r = LocalEval.eval(Filter(EqCols("src", "trg"), Rel("E")), Map("E" -> withLoop))
    assert(asPairs(r) == Set((3L, 3L)))
  }

  test("rename") {
    val r = LocalEval.eval(Rename("trg", "m", Rel("E")), env)
    assert(r.cols.toSet == Set("src", "m"))
    assert(pairsOf(r, "src", "m") == paperE)
  }

  test("natural join = composition after renames") {
    val comp = Term.compose(Rel("S"), Rel("E"))
    val r = LocalEval.eval(comp, env)
    assert(asPairs(r) == bruteCompose(paperS, paperE))
  }

  test("join with no common columns is a cartesian product") {
    val t = Join(Rename("src", "a", Rename("trg", "b", Rel("S"))), Rel("E"))
    val r = LocalEval.eval(t, env)
    assert(r.size == paperS.size * paperE.size)
  }

  test("antijoin removes matching tuples") {
    val t = Antijoin(Rel("E"), Rel("S"))
    assert(asPairs(LocalEval.eval(t, env)) == paperE -- paperS)
  }

  test("antijoin on disjoint columns: empty right keeps left") {
    val empty = LocalRel(Vector("a"), Vector.empty)
    val t = Antijoin(Rel("E"), Rel("Z"))
    assert(asPairs(LocalEval.eval(t, env + ("Z" -> empty))) == paperE)
    val nonEmpty = LocalRel(Vector("a"), Vector(Vector(1L)))
    assert(LocalEval.eval(t, env + ("Z" -> nonEmpty)).isEmpty)
  }

  test("union deduplicates") {
    val r = LocalEval.eval(Union(Rel("E"), Rel("S")), env)
    assert(asPairs(r) == paperE) // S ⊆ E
    assert(r.size == paperE.size)
  }

  test("antiprojection deduplicates") {
    val r = LocalEval.eval(AntiProj("trg", Rel("E")), env)
    assert(r.cols == Vector("src"))
    assert(r.rows.toSet.size == r.rows.size)
    assert(r.rows.map(_.head).toSet == paperE.map(_._1))
  }

  test("Example 2 fixpoint matches the paper's trace") {
    val r = LocalEval.eval(example2, env)
    val expected = paperS ++
      Set((1L, 3L), (1L, 5L), (10L, 5L), (10L, 12L)) ++
      Set((1L, 6L), (10L, 6L))
    assert(asPairs(r) == expected)
    assert(asPairs(r) == bruteFrom(paperS, paperE))
  }

  test("E+ fixpoint equals brute-force transitive closure") {
    val r = LocalEval.eval(closureE, env)
    assert(asPairs(r) == bruteClosure(paperE))
  }

  test("left-appending closure equals right-appending closure") {
    val left = Fix("X", Union(Rel("E"),
      AntiProj("m", Join(Rename("trg", "m", Rel("E")), Rename("src", "m", RecVar("X"))))))
    assert(asPairs(LocalEval.eval(left, env)) == asPairs(LocalEval.eval(closureE, env)))
  }

  test("fixpoint on random graphs equals brute closure (20 seeds)") {
    (1 to 20).foreach { seed =>
      val e = randEdges(12, 20, seed)
      val r = LocalEval.eval(closureE, Map("E" -> rel(e)))
      assert(asPairs(r) == bruteClosure(e), s"seed=$seed")
    }
  }

  test("fixpoint with union constant part") {
    val fix = Fix("X", Union(Union(Rel("S"), Rel("E")),
      AntiProj("c", Join(Rename("trg", "c", RecVar("X")), Rename("src", "c", Rel("E"))))))
    val r = LocalEval.eval(fix, Map("E" -> rel(paperE), "S" -> rel(paperS)))
    assert(asPairs(r) == bruteClosure(paperE))
  }

  test("merged-style fixpoint with two variable branches") {
    // μ(Z = S ∪ E∘Z ∪ Z∘E) = E* ∘ S ∘ E*
    val prepend = AntiProj("k1", Join(Rename("trg", "k1", Rel("E")), Rename("src", "k1", RecVar("Z"))))
    val append  = AntiProj("k2", Join(Rename("trg", "k2", RecVar("Z")), Rename("src", "k2", Rel("E"))))
    val fix = Fix("Z", Union(Rel("S"), Union(prepend, append)))
    val r = LocalEval.eval(fix, env)
    // reference: saturate S by prepending/appending E
    var acc = paperS; var changed = true
    while (changed) {
      val next = acc ++ bruteCompose(paperE, acc) ++ bruteCompose(acc, paperE)
      changed = next != acc; acc = next
    }
    assert(asPairs(r) == acc)
  }

  test("aligned reorders columns") {
    val r = rel(paperE)
    val a = r.aligned(Vector("trg", "src"))
    assert(pairsOf(a, "src", "trg") == paperE)
    assert(a.cols == Vector("trg", "src"))
  }

  test("fixpoint respects maxIters") {
    assertThrows[MuRaError](
      LocalEval.eval(closureE, Map("E" -> rel(randEdges(30, 90, 1))), maxIters = 1))
  }
}
