package repro.core

import scala.collection.mutable
import Analysis.Catalog

/** Which rewrite rules a system is allowed to use. Dist-μ-RA enables all
  * of them; the baseline configurations disable the rules the paper says
  * the corresponding system lacks (Sec. VI): BigDatalog has no fixpoint
  * reversal and no fixpoint merging, Myria performs no logical
  * optimization of recursion at all.
  */
final case class RewriteConfig(
    pushFilter: Boolean = true,
    pushJoin: Boolean = true,
    pushAntiProj: Boolean = true,
    reverse: Boolean = true,
    merge: Boolean = true,
    maxPlans: Int = 64,
) { def anyEnabled: Boolean = pushFilter || pushJoin || pushAntiProj || reverse || merge }

object RewriteConfig {
  val all: RewriteConfig = RewriteConfig()
  /** Magic-sets-level optimization: push in the written direction only. */
  val bigDatalogLite: RewriteConfig =
    RewriteConfig(reverse = false, merge = false, pushAntiProj = false)
  /** No logical optimization of recursion. */
  val none: RewriteConfig =
    RewriteConfig(pushFilter = false, pushJoin = false, pushAntiProj = false,
                  reverse = false, merge = false)
}

/** The MuRewriter of Sec. III: explores the space of semantically
  * equivalent logical plans.
  *
  *  - [[normalize]] performs the classical, always-beneficial moves:
  *    sinking filters and anti-projections toward the leaves and sinking
  *    renames into fixpoints (pure column relabeling), so that the
  *    fixpoint-specific rules below see their redexes.
  *  - [[explore]] applies the five fixpoint rules of Sec. III — pushing
  *    filters / joins / anti-projections into fixpoints, reversing
  *    fixpoints, merging fixpoints — with breadth-first bounded search,
  *    deduplicating plans by α-equivalence.
  */
object Rewriter {

  private type RecEnv = Map[String, Set[String]]

  // ---------------------------------------------------------------------
  // Normalization
  // ---------------------------------------------------------------------

  def normalize(t: Term, cat: Catalog): Term = {
    var cur = t
    var guard = 0
    while (guard < 200) {
      val next = normPass(cur, cat, Map.empty)
      if (next == cur) return cur
      cur = next
      guard += 1
    }
    cur
  }

  private def normPass(t: Term, cat: Catalog, rec: RecEnv): Term = {
    val u = t match {
      case Rel(_) | RecVar(_) => t
      case Filter(c, s)       => Filter(c, normPass(s, cat, rec))
      case Join(l, r)         => Join(normPass(l, cat, rec), normPass(r, cat, rec))
      case Antijoin(l, r)     => Antijoin(normPass(l, cat, rec), normPass(r, cat, rec))
      case Union(l, r)        => Union(normPass(l, cat, rec), normPass(r, cat, rec))
      case AntiProj(c, s)     => AntiProj(c, normPass(s, cat, rec))
      case Rename(f, o, s)    => Rename(f, o, normPass(s, cat, rec))
      case fix @ Fix(x, body) =>
        val xs = Analysis.fixSort(fix, cat, rec)
        Fix(x, normPass(body, cat, rec + (x -> xs)))
    }
    localNorm(u, cat, rec).getOrElse(u)
  }

  /** One local normalization step at the root of `u`, if any applies. */
  private def localNorm(u: Term, cat: Catalog, rec: RecEnv): Option[Term] = u match {
    // --- filter sinking -------------------------------------------------
    case Filter(c, Union(l, r)) => Some(Union(Filter(c, l), Filter(c, r)))
    case Filter(c, AntiProj(d, s)) => Some(AntiProj(d, Filter(c, s)))
    case Filter(c, Rename(f, o, s)) => Some(Rename(f, o, Filter(c.rename(o, f), s)))
    case Filter(c, Antijoin(l, r)) => Some(Antijoin(Filter(c, l), r))
    case Filter(c, Join(l, r)) =>
      val sl = Analysis.sort(l, cat, rec); val sr = Analysis.sort(r, cat, rec)
      if (c.cols.subsetOf(sl) && !c.cols.subsetOf(sr)) Some(Join(Filter(c, l), r))
      else if (c.cols.subsetOf(sr) && !c.cols.subsetOf(sl)) Some(Join(l, Filter(c, r)))
      else if (c.cols.subsetOf(sl) && c.cols.subsetOf(sr)) Some(Join(Filter(c, l), Filter(c, r)))
      else None

    // --- anti-projection sinking ----------------------------------------
    case AntiProj(c, Union(l, r)) => Some(Union(AntiProj(c, l), AntiProj(c, r)))
    case AntiProj(c, Filter(cond, s)) if !cond.cols.contains(c) =>
      Some(Filter(cond, AntiProj(c, s)))
    case AntiProj(c, Rename(f, o, s)) =>
      if (c == o) Some(AntiProj(f, s)) else Some(Rename(f, o, AntiProj(c, s)))
    case AntiProj(c, Join(l, r)) =>
      val sl = Analysis.sort(l, cat, rec); val sr = Analysis.sort(r, cat, rec)
      val common = sl intersect sr
      if (common.contains(c)) None
      else if (sl.contains(c)) Some(Join(AntiProj(c, l), r))
      else Some(Join(l, AntiProj(c, r)))
    case AntiProj(c, Antijoin(l, r)) =>
      val common = Analysis.sort(l, cat, rec) intersect Analysis.sort(r, cat, rec)
      if (common.contains(c)) None else Some(Antijoin(AntiProj(c, l), r))

    // --- rename sinking into fixpoints (pure relabeling) ----------------
    case Rename(f, to, fix @ Fix(x, body)) =>
      if (!relabelSafe(body, to, cat)) None
      else {
        // If `to` is used internally in the body, relabel those uses to a
        // fresh name first (it is not in the output sort, so this is a
        // pure internal relabeling).
        val avoid = body.allColNames ++ Set(f, to) ++ body.freeRels.flatMap(cat(_))
        val cleaned =
          if (body.allColNames.contains(to))
            Term.renameEverywhere(body, to, Fresh.col(avoid, "r"), cat(_))
          else body
        if (!relabelSafe(cleaned, to, cat)) None
        else Some(Fix(x, Term.renameEverywhere(cleaned, f, to, cat(_))))
      }
    case _ => None
  }

  /** A relabel target is safe when it is not used in the term and does not
    * clash with the schema of any base relation mentioning the source.
    */
  private def relabelSafe(body: Term, to: String, cat: Catalog): Boolean =
    !body.allColNames.contains(to) && body.freeRels.forall(n => !cat(n).contains(to))

  // ---------------------------------------------------------------------
  // Spine analysis (the path(s) from occurrences of X up to the root of a
  // variable branch) — preconditions of the push rules.
  // ---------------------------------------------------------------------

  final case class SpineInfo(
      renameSources: Set[String], renameTargets: Set[String],
      filterCols: Set[String], antiProjCols: Set[String],
      partnerSorts: Set[String]) {
    def ++(o: SpineInfo): SpineInfo = SpineInfo(
      renameSources ++ o.renameSources, renameTargets ++ o.renameTargets,
      filterCols ++ o.filterCols, antiProjCols ++ o.antiProjCols,
      partnerSorts ++ o.partnerSorts)
  }
  private val emptySpine = SpineInfo(Set.empty, Set.empty, Set.empty, Set.empty, Set.empty)

  def spineInfo(t: Term, x: String, cat: Catalog, rec: RecEnv): SpineInfo = {
    if (!t.usesRec(x)) return emptySpine
    t match {
      case RecVar(_)       => emptySpine
      case Filter(c, s)    => spineInfo(s, x, cat, rec).copy() ++ emptySpine.copy(filterCols = c.cols)
      case AntiProj(c, s)  => spineInfo(s, x, cat, rec) ++ emptySpine.copy(antiProjCols = Set(c))
      case Rename(f, o, s) => spineInfo(s, x, cat, rec) ++ emptySpine.copy(renameSources = Set(f), renameTargets = Set(o))
      case Join(l, r) =>
        if (l.usesRec(x)) spineInfo(l, x, cat, rec) ++ emptySpine.copy(partnerSorts = Analysis.sort(r, cat, rec))
        else spineInfo(r, x, cat, rec) ++ emptySpine.copy(partnerSorts = Analysis.sort(l, cat, rec))
      case Antijoin(l, r) =>
        spineInfo(l, x, cat, rec) ++ emptySpine.copy(partnerSorts = Analysis.sort(r, cat, rec))
      case Union(l, r) => spineInfo(l, x, cat, rec) ++ spineInfo(r, x, cat, rec)
      case Rel(_) | Fix(_, _) => emptySpine // x cannot occur here under F_cond
    }
  }

  // ---------------------------------------------------------------------
  // Linear-fixpoint recognition (closures and base-extended closures)
  // ---------------------------------------------------------------------

  /** A recognized linear fixpoint over a binary sort: a single variable
    * branch `π̃_k(ρ_{xCol}^k(X) ⋈ ρ_{eCol}^k(E))` with E constant.
    * Semantically: each step joins X's `xCol` end with E's `eCol` end and
    * keeps E's other end, i.e. the recursion extends paths on the `xCol`
    * side.
    */
  final case class LinearFix(x: String, constBranches: List[Term], e: Term,
                             xCol: String, eCol: String, k: String, sort: Set[String])

  def recognizeLinear(fix: Fix, cat: Catalog): Option[LinearFix] = {
    val xSort =
      try Analysis.fixSort(fix, cat) catch { case MuRaError(_) => return None }
    if (xSort.size != 2) return None
    val (constT, varB) =
      try Analysis.decompose(fix, cat) catch { case MuRaError(_) | _: MatchError => return None }
    if (varB.size != 1) return None
    varB.head match {
      case AntiProj(k, Join(a, b)) =>
        def split(p: Term, q: Term): Option[LinearFix] = p match {
          case Rename(xc, `k`, RecVar(fix.x)) =>
            q match {
              case Rename(ec, `k`, e) if !e.usesRec(fix.x) && e.freeRecVars.isEmpty
                  && xSort.contains(xc) && xSort.contains(ec)
                  && Analysis.sort(e, cat) == xSort =>
                Some(LinearFix(fix.x, Term.unionBranches(constT), e, xc, ec, k, xSort))
              case _ => None
            }
          case _ => None
        }
        split(a, b).orElse(split(b, a))
      case _ => None
    }
  }

  /** True when the fixpoint is a *pure closure* `E+`: its constant part is
    * α-equivalent to its step relation. Only pure closures can be
    * reversed (`E+` computed left-to-right equals `E+` computed
    * right-to-left); base-extended closures `R∘E*` cannot.
    */
  def isPureClosure(lf: LinearFix, cat: Catalog): Boolean =
    lf.constBranches match {
      case List(r) => Analysis.alphaEq(r, lf.e, cat)
      case _       => false
    }

  // ---------------------------------------------------------------------
  // Fixpoint rewrite rules
  // ---------------------------------------------------------------------

  private def rebuildFix(x: String, constBranches: List[Term], varBranches: List[Term]): Fix =
    Fix(x, Term.unionAll(constBranches ++ varBranches))

  /** σ_cond(μ(X = R ∪ φ)) → μ(X = σ_cond(R) ∪ φ) when every column the
    * condition reads is stable (Sec. III "pushing filters into fixpoints").
    */
  private def pushFilterRule(u: Term, cat: Catalog, rec: RecEnv): Vector[Term] = u match {
    case Filter(cond, fix @ Fix(x, _)) if fix.freeRecVars.isEmpty =>
      val stable = try Stabilizer.stableCols(fix, cat) catch { case MuRaError(_) => return Vector.empty }
      if (!cond.cols.subsetOf(stable)) Vector.empty
      else {
        val (constT, varB) = Analysis.decompose(fix, cat)
        Vector(rebuildFix(x, Term.unionBranches(constT).map(Filter(cond, _)), varB))
      }
    case _ => Vector.empty
  }

  /** T ⋈ μ(X = R ∪ φ) → μ(X = (T ⋈ R) ∪ φ) when the join columns are all
    * stable and T's extra columns cannot be captured inside φ (clashing
    * extras are relabeled to fresh names and renamed back outside).
    */
  private def pushJoinRule(u: Term, cat: Catalog, rec: RecEnv): Vector[Term] = u match {
    case Join(a, b) =>
      def attempt(tConst: Term, fix: Fix): Option[Term] = {
        if (tConst.freeRecVars.nonEmpty || fix.freeRecVars.nonEmpty) return None
        val stable = try Stabilizer.stableCols(fix, cat) catch { case MuRaError(_) => return None }
        val fixSort = Analysis.fixSort(fix, cat)
        val tSort = try Analysis.sort(tConst, cat, rec) catch { case MuRaError(_) => return None }
        val j = tSort intersect fixSort
        if (j.isEmpty || !j.subsetOf(stable)) return None
        val extras = tSort -- j
        val (constT, varB) = Analysis.decompose(fix, cat)
        val xs = fixSort
        val hazards: Set[String] = varB.map { br =>
          val si = spineInfo(br, fix.x, cat, rec + (fix.x -> xs))
          si.renameSources ++ si.renameTargets ++ si.filterCols ++ si.antiProjCols ++ si.partnerSorts
        }.foldLeft(Set.empty[String])(_ ++ _) ++ fix.body.allColNames
        // Relabel clashing extra columns of T to fresh names; rename back
        // outside the new fixpoint.
        var t2 = tConst
        var outer = List.empty[(String, String)] // fresh -> original
        var avoid = hazards ++ tSort ++ fixSort ++ tConst.allColNames
        extras.toSeq.sorted.foreach { e =>
          if (hazards.contains(e)) {
            val f = Fresh.col(avoid, "j"); avoid += f
            t2 = Rename(e, f, t2)
            outer ::= (f -> e)
          }
        }
        val pushed = rebuildFix(fix.x, Term.unionBranches(constT).map(Join(t2, _)), varB)
        Some(outer.foldLeft(pushed: Term) { case (acc, (f, e)) => Rename(f, e, acc) })
      }
      (a, b) match {
        case (t, f: Fix) => attempt(t, f).toVector ++ (t match {
          case tf: Fix => attempt(b, tf).toVector
          case _       => Vector.empty
        })
        case (f: Fix, t) => attempt(t, f).toVector
        case _           => Vector.empty
      }
    case _ => Vector.empty
  }

  /** π̃_c(μ(X = R ∪ φ)) → μ(X = π̃_c(R) ∪ φ) when c is stable and φ never
    * reads X's column c (it is a pure passthrough): c is then dead inside
    * the fixpoint and dropping it early shrinks every iteration.
    */
  private def pushAntiProjRule(u: Term, cat: Catalog, rec: RecEnv): Vector[Term] = u match {
    case AntiProj(c, fix @ Fix(x, _)) if fix.freeRecVars.isEmpty =>
      val stable = try Stabilizer.stableCols(fix, cat) catch { case MuRaError(_) => return Vector.empty }
      if (!stable.contains(c)) Vector.empty
      else {
        val (constT, varB) = Analysis.decompose(fix, cat)
        val xs = Analysis.fixSort(fix, cat)
        val reads = varB.exists { br =>
          val si = spineInfo(br, x, cat, rec + (x -> xs))
          si.partnerSorts.contains(c) || si.filterCols.contains(c) ||
            si.renameSources.contains(c) || si.renameTargets.contains(c)
        }
        if (reads) Vector.empty
        else Vector(rebuildFix(x, Term.unionBranches(constT).map(AntiProj(c, _)), varB))
      }
    case _ => Vector.empty
  }

  /** Reverse a *pure closure*: μ(X = E ∪ X∘E) ↔ μ(X = E ∪ E∘X). Both
    * denote E+; reversing changes which column is stable, enabling pushes
    * on the other side (Sec. III "reversing a fixpoint").
    */
  private def reverseRule(u: Term, cat: Catalog, rec: RecEnv): Vector[Term] = u match {
    case fix: Fix if fix.freeRecVars.isEmpty =>
      recognizeLinear(fix, cat) match {
        case Some(lf) if isPureClosure(lf, cat) =>
          val other = (lf.sort - lf.xCol).head
          val eOther = (lf.sort - lf.eCol).head
          // swap roles: X now renamed on the column E was renamed on, etc.
          val step = AntiProj(lf.k, Join(
            Rename(lf.eCol, lf.k, RecVar(lf.x)),
            Rename(lf.xCol, lf.k, lf.e)))
          val _ = (other, eOther)
          Vector(rebuildFix(lf.x, lf.constBranches, List(step)))
        case _ => Vector.empty
      }
    case _ => Vector.empty
  }

  /** Merge two concatenated linear fixpoints (Sec. III "merging
    * fixpoints"):
    *
    *   π̃_m(F1 ⋈ F2) with F1 = A*∘R1 over (s,m) and F2 = R2∘B* over (m,t)
    *   →  μ(Z = π̃_m(R1 ⋈ R2) ∪ A∘Z ∪ Z∘B)
    *
    * sound because composition distributes over union, so the result is
    * ∪_{i,j} A^i ∘ R1 ∘ R2 ∘ B^j on both sides. F1 must extend on its
    * non-shared side "to the left" and F2 "to the right"; the reverse rule
    * supplies those orientations for pure closures.
    */
  private def mergeRule(u: Term, cat: Catalog, rec: RecEnv): Vector[Term] = u match {
    case AntiProj(m, Join(a: Fix, b: Fix))
        if a.freeRecVars.isEmpty && b.freeRecVars.isEmpty =>
      (recognizeLinear(a, cat), recognizeLinear(b, cat)) match {
        case (Some(l1), Some(l2)) =>
          val s1 = l1.sort; val s2 = l2.sort
          if ((s1 intersect s2) != Set(m)) return Vector.empty
          val s = (s1 - m).head // F1's non-shared column
          val t = (s2 - m).head // F2's non-shared column
          // F1 must prepend A on its s side: its step renames X on s and A on m.
          // F2 must append B on its t side: its step renames X on t and B on m.
          if (l1.xCol != s || l1.eCol != m || l2.xCol != t || l2.eCol != m)
            return Vector.empty
          val z = Fresh.recVar()
          val base = AntiProj(m, Join(Term.unionAll(l1.constBranches), Term.unionAll(l2.constBranches)))
          val avoid = l1.e.allColNames ++ l2.e.allColNames ++ Set(s, m, t) ++
            l1.constBranches.flatMap(_.allColNames) ++ l2.constBranches.flatMap(_.allColNames)
          val k1 = Fresh.col(avoid, "k")
          val k2 = Fresh.col(avoid + k1, "k")
          val prepend = AntiProj(k1, Join(Rename(m, k1, l1.e), Rename(s, k1, RecVar(z))))
          val append  = AntiProj(k2, Join(Rename(t, k2, RecVar(z)), Rename(m, k2, l2.e)))
          Vector(Fix(z, Union(base, Union(prepend, append))))
        case _ => Vector.empty
      }
    case _ => Vector.empty
  }

  // ---------------------------------------------------------------------
  // Bounded plan-space exploration
  // ---------------------------------------------------------------------

  private def enabledRules(cfg: RewriteConfig): Vector[(Term, Catalog, RecEnv) => Vector[Term]] = {
    val b = Vector.newBuilder[(Term, Catalog, RecEnv) => Vector[Term]]
    if (cfg.pushFilter) b += pushFilterRule
    if (cfg.pushJoin) b += pushJoinRule
    if (cfg.pushAntiProj) b += pushAntiProjRule
    if (cfg.reverse) b += reverseRule
    if (cfg.merge) b += mergeRule
    b.result()
  }

  /** Apply `rule` at every position of `t`, returning each whole term
    * with exactly one redex rewritten.
    */
  private def applyEverywhere(t: Term, cat: Catalog, rec: RecEnv,
                              rule: (Term, Catalog, RecEnv) => Vector[Term]): Vector[Term] = {
    val here = rule(t, cat, rec)
    val below: Vector[Term] = t match {
      case Rel(_) | RecVar(_) => Vector.empty
      case Filter(c, s)   => applyEverywhere(s, cat, rec, rule).map(Filter(c, _))
      case Join(l, r)     =>
        applyEverywhere(l, cat, rec, rule).map(Join(_, r)) ++
        applyEverywhere(r, cat, rec, rule).map(Join(l, _))
      case Antijoin(l, r) =>
        applyEverywhere(l, cat, rec, rule).map(Antijoin(_, r)) ++
        applyEverywhere(r, cat, rec, rule).map(Antijoin(l, _))
      case Union(l, r)    =>
        applyEverywhere(l, cat, rec, rule).map(Union(_, r)) ++
        applyEverywhere(r, cat, rec, rule).map(Union(l, _))
      case AntiProj(c, s) => applyEverywhere(s, cat, rec, rule).map(AntiProj(c, _))
      case Rename(f, o, s) => applyEverywhere(s, cat, rec, rule).map(Rename(f, o, _))
      case fix @ Fix(x, body) =>
        val xs = try Analysis.fixSort(fix, cat, rec) catch { case MuRaError(_) => return here }
        applyEverywhere(body, cat, rec + (x -> xs), rule).map(Fix(x, _))
    }
    here ++ below
  }

  /** Cost-guided best-first exploration of the plan space: start from
    * the normalized input; repeatedly expand the cheapest not-yet-expanded
    * plan by applying every enabled rule at every position, re-normalize,
    * deduplicate by α-equivalence. `rank` orders the frontier (pass the
    * cost estimate — beneficial rewrites like pushed filters make plans
    * cheaper, so chains of 4–5 rewrites are reached long before the
    * expansion budget runs out; with the default constant rank this
    * degenerates to breadth-first search). Expands at most `cfg.maxPlans`
    * plans. Returns every discovered plan (including the input), each
    * semantically equivalent to the input.
    */
  def explore(t0: Term, cat: Catalog, cfg: RewriteConfig,
              rank: Term => Double = _ => 0.0): Vector[Term] = {
    val start = normalize(t0, cat)
    if (!cfg.anyEnabled) return Vector(start)
    val rules = enabledRules(cfg)
    val seen = mutable.LinkedHashMap.empty[Term, Term] // canonical -> representative
    // min-heap on rank; insertion index breaks ties FIFO
    implicit val ord: Ordering[(Double, Long, Term)] =
      Ordering.by[(Double, Long, Term), (Double, Long)](e => (-e._1, -e._2))
    val frontier = mutable.PriorityQueue.empty[(Double, Long, Term)]
    var counter = 0L
    def safeRank(t: Term): Double =
      try rank(t) catch { case MuRaError(_) => Double.MaxValue }
    def add(t: Term): Unit = {
      if (seen.size >= cfg.maxPlans * 8) return // frontier memory bound
      val key = try Analysis.canonical(t, cat) catch { case MuRaError(_) => return }
      if (!seen.contains(key)) {
        seen(key) = t
        counter += 1
        frontier.enqueue((safeRank(t), counter, t))
      }
    }
    add(start)
    var expansions = 0
    while (frontier.nonEmpty && expansions < cfg.maxPlans) {
      val (_, _, t) = frontier.dequeue()
      expansions += 1
      rules.foreach { rule =>
        applyEverywhere(t, cat, Map.empty, rule).foreach { t2 =>
          add(normalize(t2, cat))
        }
      }
    }
    seen.values.toVector
  }
}
