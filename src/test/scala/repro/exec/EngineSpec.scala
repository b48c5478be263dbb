package repro.exec

import repro.SparkSpec
import repro.SparkTestData._
import repro.baselines.{CentralizedMuRA, GraphXRPQ}
import repro.core._
import repro.core.TestGraphs.{labeledRel, randLabeled}
import repro.ucrpq.Query2Mu

/** End-to-end engine tests: every engine variant (Dist-μ-RA with each
  * plan, BigDatalog-lite, Myria-lite, Centralized μ-RA, GraphX) must
  * produce identical results on queries covering all six classes
  * C1–C6 of Sec. V-D.
  */
class EngineSpec extends SparkSpec {

  private val g: Set[(Long, String, Long)] = randLabeled(14, 40, Seq("a", "b"), seed = 11) ++
    Set((1L, "a", 2L), (2L, "b", 3L)) // make sure constants participate
  private lazy val gDf = labeledDf(spark, g).cache()
  private val consts: Map[String, Any] = Map("N1" -> 1L, "N2" -> 2L, "N3" -> 3L)
  private def catalog = Map(Query2Mu.GraphRel -> gDf)

  /** Queries covering each class alone and combinations (Sec. V-D). */
  private val queries: Seq[(String, String)] = Seq(
    "C1 single recursion"        -> "?x,?y <- ?x a+ ?y",
    "C2 filter right"            -> "?x <- ?x a+ N3",
    "C3 filter left"             -> "?x <- N1 a+ ?x",
    "C4 concat right"            -> "?x,?y <- ?x a+/b ?y",
    "C5 concat left"             -> "?x,?y <- ?x b/a+ ?y",
    "C6 concat recursions"       -> "?x,?y <- ?x a+/b+ ?y",
    "C2+C5 combined"             -> "?x <- ?x b/a+ N3",
    "C3+C4 combined"             -> "?x <- N1 a+/b ?x",
    "alternation closure"        -> "?x,?y <- ?x (a|b)+ ?y",
    "inverse closure"            -> "?x,?y <- ?x (a/-a)+ ?y",
    "conjunction"                -> "?x,?z <- ?x a+ ?y, ?y b+ ?z",
    "projection head"            -> "?y <- ?x a+ ?y",
  )

  /** Reference: unoptimized term evaluated by the in-memory evaluator. */
  private def reference(q: String): Set[Seq[Any]] = {
    val t = Query2Mu.translate(q, consts)
    val r = LocalEval.eval(t, Map(Query2Mu.GraphRel -> labeledRel(g)))
    val sorted = r.aligned(r.cols.sorted)
    sorted.rows.map(_.toSeq).toSet
  }

  private def resultOf(df: org.apache.spark.sql.DataFrame): Set[Seq[Any]] = {
    val cols = df.columns.sorted
    df.select(cols.map(df.col): _*).collect().map(_.toSeq).toSet
  }

  private lazy val engines: Seq[(String, String => org.apache.spark.sql.DataFrame)] = Seq(
    "Dist-mu-RA" -> Engines.distMuRA(spark, catalog, consts, 4).runQuery _,
    "Dist-mu-RA (P_gld)" -> Engines.distMuRAGld(spark, catalog, consts, 4).runQuery _,
    "Dist-mu-RA (P_plw_s)" -> Engines.distMuRAPlwS(spark, catalog, consts, 4).runQuery _,
    "Dist-mu-RA (P_plw_pg)" -> Engines.distMuRAPlwPg(spark, catalog, consts, 4).runQuery _,
    "BigDatalog-lite" -> Engines.bigDatalogLite(spark, catalog, consts, 4).runQuery _,
    "Myria-lite" -> Engines.myriaLite(spark, catalog, consts, 4).runQuery _,
    "Centralized mu-RA" -> new CentralizedMuRA(spark, catalog, consts).runQuery _,
    "GraphX" -> ((q: String) => GraphXRPQ.runQuery(spark, gDf, q, consts)),
  )

  for ((cls, q) <- queries; (engName, run) <- engines) {
    test(s"$cls [$q] on $engName") {
      assert(resultOf(run(q)) == reference(q), s"wrong result for $q on $engName")
    }
  }

  test("Dist-mu-RA picks a filtered-base plan for C2 (reversal + push)") {
    val eng = Engines.distMuRA(spark, catalog, consts, 4)
    val plan = eng.plan("?x <- ?x a+ N3")
    // The chosen plan must contain a fixpoint whose constant part filters on N3.
    def hasFilteredBase(t: Term): Boolean = t match {
      case f: Fix =>
        val (c, _) = Analysis.decompose(f, eng.cat)
        def mentionsFilter(u: Term): Boolean = u match {
          case Filter(EqConst(_, v), _) => v == 3L
          case Filter(_, s)    => mentionsFilter(s)
          case AntiProj(_, s)  => mentionsFilter(s)
          case Rename(_, _, s) => mentionsFilter(s)
          case Join(l, r)      => mentionsFilter(l) || mentionsFilter(r)
          case Union(l, r)     => mentionsFilter(l) || mentionsFilter(r)
          case _               => false
        }
        mentionsFilter(c) || hasFilteredBase(f.body)
      case Filter(_, s)    => hasFilteredBase(s)
      case AntiProj(_, s)  => hasFilteredBase(s)
      case Rename(_, _, s) => hasFilteredBase(s)
      case Join(l, r)      => hasFilteredBase(l) || hasFilteredBase(r)
      case Union(l, r)     => hasFilteredBase(l) || hasFilteredBase(r)
      case _               => false
    }
    assert(hasFilteredBase(plan), plan.pretty)
  }

  test("BigDatalog-lite cannot push the C2 filter (stays outside the fixpoint)") {
    val eng = Engines.bigDatalogLite(spark, catalog, consts, 4)
    val plan = eng.plan("?x <- ?x a+ N3")
    def fixHasFilter(t: Term): Boolean = t match {
      case f: Fix =>
        Term.unionBranches(f.body).exists {
          case b if !b.usesRec(f.x) => b.allColNames.nonEmpty && {
            def mf(u: Term): Boolean = u match {
              case Filter(EqConst(_, v), _) => v == 3L
              case Filter(_, s)    => mf(s)
              case AntiProj(_, s)  => mf(s)
              case Rename(_, _, s) => mf(s)
              case Join(l, r)      => mf(l) || mf(r)
              case Union(l, r)     => mf(l) || mf(r)
              case _               => false
            }
            mf(b)
          }
          case _ => false
        }
      case Filter(_, s)    => fixHasFilter(s)
      case AntiProj(_, s)  => fixHasFilter(s)
      case Rename(_, _, s) => fixHasFilter(s)
      case Join(l, r)      => fixHasFilter(l) || fixHasFilter(r)
      case Union(l, r)     => fixHasFilter(l) || fixHasFilter(r)
      case _               => false
    }
    assert(!fixHasFilter(plan), plan.pretty)
  }

  test("Dist-mu-RA avoids joining two materialized closures on C6; BigDatalog-lite cannot") {
    def countFix(t: Term): Int = t match {
      case Fix(_, b)       => 1 + countFix(b)
      case Filter(_, s)    => countFix(s)
      case AntiProj(_, s)  => countFix(s)
      case Rename(_, _, s) => countFix(s)
      case Join(l, r)      => countFix(l) + countFix(r)
      case Union(l, r)     => countFix(l) + countFix(r)
      case Antijoin(l, r)  => countFix(l) + countFix(r)
      case _               => 0
    }
    // A "join of two closures" = some Join with a fixpoint on each side.
    def joinsTwoFixes(t: Term): Boolean = t match {
      case Join(l, r)      => (countFix(l) > 0 && countFix(r) > 0) || joinsTwoFixes(l) || joinsTwoFixes(r)
      case Fix(_, b)       => joinsTwoFixes(b)
      case Filter(_, s)    => joinsTwoFixes(s)
      case AntiProj(_, s)  => joinsTwoFixes(s)
      case Rename(_, _, s) => joinsTwoFixes(s)
      case Union(l, r)     => joinsTwoFixes(l) || joinsTwoFixes(r)
      case Antijoin(l, r)  => joinsTwoFixes(l) || joinsTwoFixes(r)
      case _               => false
    }
    val distEng = Engines.distMuRA(spark, catalog, consts, 4)
    val distPlan = distEng.plan("?x,?y <- ?x a+/b+ ?y")
    val bdPlan = Engines.bigDatalogLite(spark, catalog, consts, 4).plan("?x,?y <- ?x a+/b+ ?y")
    // Dist-μ-RA's plan uses merge/push-join: no join of two materialized
    // closures (the chosen plan nests one fixpoint in the other's base or
    // merges them into a single fixpoint — the paper's "mixture").
    assert(!joinsTwoFixes(distPlan), distPlan.pretty)
    // BigDatalog-lite computes the two closures separately and joins them.
    assert(joinsTwoFixes(bdPlan), bdPlan.pretty)
    // The fully merged single fixpoint is among Dist-μ-RA's candidates.
    val t = Query2Mu.translate("?x,?y <- ?x a+/b+ ?y", consts)
    val candidates = Rewriter.explore(t, distEng.cat, RewriteConfig.all)
    assert(candidates.exists(countFix(_) == 1), "merged plan not found in the plan space")
  }

  test("engine rejects non-F_cond terms") {
    val eng = Engines.distMuRA(spark, catalog, consts, 4)
    assertThrows[MuRaError](
      eng.run(Fix("X", Union(edgeTerm, Join(RecVar("X"), RecVar("X"))))))
  }

  private def edgeTerm = Query2Mu.edge("a")

  test("engine stats collect row and distinct counts") {
    val eng = Engines.distMuRA(spark, catalog, consts, 4)
    val st = eng.stats(Query2Mu.GraphRel)
    assert(st.rows == g.size.toDouble)
    assert(st.distinct.keySet == Set("src", "pred", "trg"))
  }
}
