package repro.core

/** Raised when a term is ill-sorted or violates the F_cond conditions. */
final case class MuRaError(msg: String) extends RuntimeException(msg)

/** Sort (column-set) computation and the F_cond well-formedness checks of
  * Sec. II-B of the paper: positivity, linearity, non-mutual recursion —
  * plus the `μ(X = R ∪ φ)` decomposition of Proposition 2.
  */
object Analysis {

  /** Maps a base relation name to its set of columns. */
  type Catalog = Map[String, Set[String]]

  /** Column set of a term. `rec` gives the sorts of free recursive
    * variables. Throws [[MuRaError]] on ill-sorted terms.
    */
  def sort(t: Term, cat: Catalog, rec: Map[String, Set[String]] = Map.empty): Set[String] = t match {
    case Rel(n) =>
      cat.getOrElse(n, throw MuRaError(s"unknown relation $n"))
    case RecVar(x) =>
      rec.getOrElse(x, throw MuRaError(s"unbound recursive variable $x"))
    case Filter(c, s) =>
      val ss = sort(s, cat, rec)
      val missing = c.cols -- ss
      if (missing.nonEmpty) throw MuRaError(s"filter on missing column(s) $missing in ${s.pretty}")
      ss
    case Join(l, r) =>
      sort(l, cat, rec) ++ sort(r, cat, rec)
    case Antijoin(l, r) =>
      sort(r, cat, rec) // type-check the right side too
      sort(l, cat, rec)
    case Union(l, r) =>
      val sl = sort(l, cat, rec); val sr = sort(r, cat, rec)
      if (sl != sr) throw MuRaError(s"union of different sorts: $sl vs $sr")
      sl
    case AntiProj(c, s) =>
      val ss = sort(s, cat, rec)
      if (!ss.contains(c)) throw MuRaError(s"anti-projection of missing column $c from $ss")
      ss - c
    case Rename(f, to, s) =>
      val ss = sort(s, cat, rec)
      if (!ss.contains(f)) throw MuRaError(s"rename of missing column $f from $ss")
      if (ss.contains(to)) throw MuRaError(s"rename target $to already in sort $ss")
      ss - f + to
    case fix @ Fix(_, _) =>
      fixSort(fix, cat, rec)
  }

  /** Sort of a fixpoint: determined by its constant part, then checked
    * against every variable-part branch (union compatibility).
    */
  def fixSort(fix: Fix, cat: Catalog, rec: Map[String, Set[String]] = Map.empty): Set[String] = {
    val branches = Term.unionBranches(fix.body)
    val (varB, constB) = branches.partition(_.usesRec(fix.x))
    if (constB.isEmpty)
      throw MuRaError(s"fixpoint has no constant part (Prop. 2 form required): ${fix.pretty}")
    val s0 = sort(constB.head, cat, rec)
    constB.tail.foreach { b =>
      val sb = sort(b, cat, rec)
      if (sb != s0) throw MuRaError(s"constant parts of fixpoint disagree: $s0 vs $sb")
    }
    varB.foreach { b =>
      val sb = sort(b, cat, rec + (fix.x -> s0))
      if (sb != s0) throw MuRaError(s"variable part sort $sb differs from constant part $s0 in ${b.pretty}")
    }
    s0
  }

  /** Decompose a fixpoint into its constant part R and the list of
    * variable-part branches (Prop. 2). Also verifies that each variable
    * branch vanishes on the empty relation (φ(∅) = ∅).
    */
  def decompose(fix: Fix, cat: Catalog): (Term, List[Term]) = {
    val branches = Term.unionBranches(fix.body)
    val (varB, constB) = branches.partition(_.usesRec(fix.x))
    if (constB.isEmpty)
      throw MuRaError(s"fixpoint has no constant part: ${fix.pretty}")
    varB.foreach { b =>
      if (!vanishesOnEmpty(b, fix.x))
        throw MuRaError(s"variable part does not satisfy φ(∅)=∅: ${b.pretty}")
    }
    (Term.unionAll(constB), varB)
  }

  /** True iff the term evaluates to ∅ whenever `x` is bound to ∅.
    * Conservative syntactic check: a join with an empty side is empty,
    * filters/renames/antiprojections of empty are empty, an antijoin is
    * contained in its left side, and a union needs both branches empty.
    */
  def vanishesOnEmpty(t: Term, x: String): Boolean = t match {
    case RecVar(y)       => y == x
    case Rel(_)          => false
    case Filter(_, s)    => vanishesOnEmpty(s, x)
    case AntiProj(_, s)  => vanishesOnEmpty(s, x)
    case Rename(_, _, s) => vanishesOnEmpty(s, x)
    case Join(l, r)      => vanishesOnEmpty(l, x) || vanishesOnEmpty(r, x)
    case Antijoin(l, _)  => vanishesOnEmpty(l, x)
    case Union(l, r)     => vanishesOnEmpty(l, x) && vanishesOnEmpty(r, x)
    case Fix(_, _)       => false // constant nested fixpoints don't vanish
  }

  /** Check the three F_cond conditions of Sec. II-B on every fixpoint in
    * the term. Throws [[MuRaError]] on the first violation.
    *
    *  - positive: the right side of every antijoin is constant in every
    *    recursive variable;
    *  - linear: no join/antijoin has recursive variables on both sides;
    *  - non mutually recursive: a fixpoint body may only use its own
    *    recursive variable (a strictness superset of the paper's
    *    condition, sufficient for every term the system generates).
    */
  def checkFcond(t: Term): Unit = t match {
    case Antijoin(l, r) =>
      if (r.freeRecVars.nonEmpty)
        throw MuRaError(s"not positive: recursive variable on antijoin right side: ${t.pretty}")
      checkFcond(l); checkFcond(r)
    case Join(l, r) =>
      if (l.freeRecVars.nonEmpty && r.freeRecVars.nonEmpty)
        throw MuRaError(s"not linear: recursive variables on both join sides: ${t.pretty}")
      checkFcond(l); checkFcond(r)
    case Fix(x, body) =>
      if ((body.freeRecVars - x).nonEmpty)
        throw MuRaError(s"mutually recursive fixpoint (uses ${body.freeRecVars - x}): ${t.pretty}")
      checkFcond(body)
    case Filter(_, s)    => checkFcond(s)
    case AntiProj(_, s)  => checkFcond(s)
    case Rename(_, _, s) => checkFcond(s)
    case Union(l, r)     => checkFcond(l); checkFcond(r)
    case Rel(_) | RecVar(_) => ()
  }

  /** Substitute the recursive variable `x` by a term (used in tests and
    * by the merge rule's soundness argument).
    */
  def substRec(t: Term, x: String, by: Term): Term = t match {
    case RecVar(`x`)     => by
    case RecVar(y)       => RecVar(y)
    case Rel(n)          => Rel(n)
    case Filter(c, s)    => Filter(c, substRec(s, x, by))
    case Join(l, r)      => Join(substRec(l, x, by), substRec(r, x, by))
    case Antijoin(l, r)  => Antijoin(substRec(l, x, by), substRec(r, x, by))
    case Union(l, r)     => Union(substRec(l, x, by), substRec(r, x, by))
    case AntiProj(c, s)  => AntiProj(c, substRec(s, x, by))
    case Rename(f, o, s) => Rename(f, o, substRec(s, x, by))
    case Fix(y, body)    => if (y == x) Fix(y, body) else Fix(y, substRec(body, x, by))
  }

  /** Canonical form for structural memoization and α-equivalence:
    * recursive variable names and every column name *not* in the free
    * interface (base-relation schemas and the output sort) are renamed to
    * a canonical numbering in traversal order.
    */
  def canonical(t: Term, cat: Catalog): Term = {
    val interface: Set[String] =
      t.freeRels.flatMap(cat.getOrElse(_, Set.empty[String])) ++ sort(t, cat)
    var colMap = Map.empty[String, String]
    var recMap = Map.empty[String, String]
    def colOf(c: String): String =
      if (interface.contains(c)) c
      else colMap.getOrElse(c, { val n = s"#c${colMap.size}"; colMap += c -> n; n })
    def recOf(x: String): String =
      recMap.getOrElse(x, { val n = s"#x${recMap.size}"; recMap += x -> n; n })
    def condOf(c: Cond): Cond = c match {
      case EqConst(col, v) => EqConst(colOf(col), v)
      case EqCols(a, b)    => EqCols(colOf(a), colOf(b))
    }
    def go(u: Term): Term = u match {
      case Rel(n)          => Rel(n)
      case RecVar(x)       => RecVar(recOf(x))
      case Filter(c, s)    => Filter(condOf(c), go(s))
      case Join(l, r)      => Join(go(l), go(r))
      case Antijoin(l, r)  => Antijoin(go(l), go(r))
      case Union(l, r)     => Union(go(l), go(r))
      case AntiProj(c, s)  => { val s2 = go(s); AntiProj(colOf(c), s2) }
      case Rename(f, o, s) => { val s2 = go(s); Rename(colOf(f), colOf(o), s2) }
      case Fix(x, body)    => { val xx = recOf(x); Fix(xx, go(body)) }
    }
    go(t)
  }

  /** α-equivalence modulo recursive-variable names and internal
    * (non-interface) column names.
    */
  def alphaEq(a: Term, b: Term, cat: Catalog): Boolean =
    canonical(a, cat) == canonical(b, cat)
}
