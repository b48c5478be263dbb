package repro.queries

import repro.core._

/** The general μ-RA terms of Sec. V-D-c that are not expressible as
  * UCRPQs (aⁿbⁿ, same-generation) plus Reach. All over an unlabeled edge
  * relation R(src, trg) — aⁿbⁿ uses a labeled G(src, pred, trg).
  */
object MuRaTerms {

  /** aⁿbⁿ: pairs connected by n a-edges followed by n b-edges (n ≥ 1):
    * μ(X = a∘b ∪ a∘X∘b) over G(src, pred, trg).
    */
  def anbn: Term = {
    def edge(l: String): Term = AntiProj(Cols.pred, Filter(EqConst(Cols.pred, l), Rel("G")))
    val a = edge("a"); val b = edge("b")
    val base = Term.compose(a, b)
    val step = Term.compose(Term.compose(a, RecVar("X")), b)
    Fix("X", Union(base, step))
  }

  /** Same generation over the parent relation R(src=parent, trg=child):
    * SG(x,y) ⇐ R(p,x) ∧ R(p,y);  SG(x,y) ⇐ R(p,x) ∧ SG(p,q) ∧ R(q,y).
    */
  def sameGeneration: Term = {
    def parentAs(p: String, c: String): Term =
      Rename(Cols.trg, c, Rename(Cols.src, p, Rel("R")))
    val base = AntiProj("p", Join(parentAs("p", "x"), parentAs("p", "y")))
    val xr = Rename("x", "p", Rename("y", "q", RecVar("X")))
    val step = AntiProj("p", AntiProj("q",
      Join(Join(parentAs("p", "x"), xr), parentAs("q", "y"))))
    Fix("X", Union(base, step))
  }

  /** Nodes reachable from `n`:
    * π̃_src(μ(X = σ_src=n(R) ∪ π̃_m(ρ_trg^m(X) ⋈ ρ_src^m(R)))).
    */
  def reach(n: Long): Term = {
    val base = Filter(EqConst(Cols.src, n), Rel("R"))
    val step = AntiProj("m", Join(
      Rename(Cols.trg, "m", RecVar("X")), Rename(Cols.src, "m", Rel("R"))))
    AntiProj(Cols.src, Fix("X", Union(base, step)))
  }

  /** Transitive closure R+ (used for the Table I "TC size" column). */
  def tc: Term = Term.closure(Rel("R"), "X")
}
