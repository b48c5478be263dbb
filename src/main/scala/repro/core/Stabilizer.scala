package repro.core

import Analysis.Catalog

/** Stable-column computation (the "stabilizer" of Definition 10 of [11],
  * as used in Sec. IV-A2 of the paper).
  *
  * A column `c` of a fixpoint `μ(X = R ∪ φ)` is *stable* when every tuple
  * produced by one application of φ copies its `c`-value unaltered from
  * the X-tuple it was derived from. Under F_cond (linearity: each
  * φ-branch uses X exactly once per join chain), stability implies that a
  * tuple with `c = v` in the fixpoint can only be derived from tuples of
  * R with `c = v` — which is what licenses (i) pushing `σ_{c=v}` into the
  * constant part and (ii) repartitioning R by `c` so the parallel local
  * fixpoints of P_plw are disjoint (no final distinct needed).
  *
  * We compute, for each output column of φ, its *provenance*: `Some(c)`
  * if the value is copied from column `c` of X, `None` otherwise
  * (constant-side columns, join-middle columns, renamed-away columns).
  */
object Stabilizer {

  /** Provenance of each output column of `t` with respect to the
    * recursive variable `x` (whose sort is `xSort`).
    */
  def provenance(t: Term, x: String, xSort: Set[String], cat: Catalog,
                 rec: Map[String, Set[String]] = Map.empty): Map[String, Option[String]] = {
    val recAll = rec + (x -> xSort)
    def go(u: Term): Map[String, Option[String]] = u match {
      case RecVar(`x`)   => xSort.map(c => c -> Some(c)).toMap
      case RecVar(y)     => recAll(y).map(c => c -> (None: Option[String])).toMap
      case Rel(n)        => cat(n).map(c => c -> (None: Option[String])).toMap
      case Filter(_, s)  => go(s)
      case AntiProj(c, s) => go(s) - c
      case Rename(f, to, s) =>
        val p = go(s)
        (p - f) + (to -> p(f))
      case Join(l, r) =>
        val pl = go(l); val pr = go(r)
        (pl.keySet ++ pr.keySet).map { c =>
          // A shared column's value is equal on both sides after the
          // natural join, so either side's provenance is valid.
          c -> pl.getOrElse(c, None).orElse(pr.getOrElse(c, None))
        }.toMap
      case Antijoin(l, _) => go(l)
      case Union(l, r) =>
        val pl = go(l); val pr = go(r)
        pl.keySet.map(c => c -> (if (pl(c) == pr.getOrElse(c, None)) pl(c) else None)).toMap
      case Fix(y, _) =>
        // A nested fixpoint is constant in x (F_cond): no provenance.
        Analysis.sort(u, cat, recAll - y).map(c => c -> (None: Option[String])).toMap
    }
    go(t)
  }

  /** Stable columns of a fixpoint in decomposed form: the columns whose
    * provenance is the identity in *every* variable-part branch.
    */
  def stableCols(fix: Fix, cat: Catalog): Set[String] = {
    val xSort = Analysis.fixSort(fix, cat)
    val (_, varBranches) = Analysis.decompose(fix, cat)
    varBranches.foldLeft(xSort) { (acc, b) =>
      val p = provenance(b, fix.x, xSort, cat)
      acc.filter(c => p.getOrElse(c, None).contains(c))
    }
  }
}
