package repro.queries

/** The paper's query workloads (Figs. 5 and 6), adapted to the synthetic
  * Yago-lite / Uniprot-lite generators: predicate abbreviations are
  * expanded ("isL" → isLocatedIn etc., footnotes 7–8 of the paper) and
  * the generic constants "C" of Fig. 6 are bound to named constants of
  * the generator (P0 = a protein, J0 = a journal, R0 = a reference).
  * Class tags (C1–C6) are carried from the paper's figures.
  */
object PaperQueries {

  final case class Q(id: String, query: String, classes: Set[String])

  /** Fig. 5 — Yago queries Q1..Q25. */
  val yago: Seq[Q] = Seq(
    Q("Q1", "?x <- ?x isMarriedTo/livesIn/isLocatedIn+/dealsWith+ Argentina", Set("C2", "C5")),
    Q("Q2", "?x <- ?x hasChild/livesIn/isLocatedIn+/dealsWith+ Japan", Set("C2", "C5", "C6")),
    Q("Q3", "?x <- ?x influences/livesIn/isLocatedIn+/dealsWith+ Sweden", Set("C2", "C5", "C6")),
    Q("Q4", "?x <- ?x livesIn/isLocatedIn+/dealsWith+ United_States", Set("C2", "C5", "C6")),
    Q("Q5", "?x <- ?x hasSuccessor/livesIn/isLocatedIn+/dealsWith+ India", Set("C2", "C5", "C6")),
    Q("Q6", "?x <- ?x hasPredecessor/livesIn/isLocatedIn+/dealsWith+ Germany", Set("C2", "C5", "C6")),
    Q("Q7", "?x <- ?x hasAcademicAdvisor/livesIn/isLocatedIn+/dealsWith+ Netherlands", Set("C2", "C5", "C6")),
    Q("Q8", "?x <- ?x isLocatedIn+/dealsWith+ United_States", Set("C2", "C6")),
    Q("Q9", "?x <- ?x (actedIn/-actedIn)+ Kevin_Bacon", Set("C2")),
    Q("Q10", "?area <- wikicat_Capitals_in_Europe -type/(isLocatedIn+/dealsWith dealsWith) ?area", Set("C3", "C4", "C5")),
    Q("Q11", "?person <- ?person (isMarriedTo+/owns/isLocatedIn+ owns/isLocatedIn+) USA", Set("C2", "C4", "C5")),
    Q("Q12", "?a,?b <- ?a isLocatedIn+/dealsWith ?b", Set("C4")),
    Q("Q13", "?a,?b <- ?a isLocatedIn+/dealsWith+ ?b", Set("C6")),
    Q("Q14", "?a,?b,?c <- ?a wasBornIn/isLocatedIn+ ?b, ?b isConnectedTo+ ?c", Set("C5", "C6")),
    Q("Q15", "?a,?b,?c <- ?a (isLocatedIn isConnectedTo)+ ?b, ?c wasBornIn ?a", Set("C5")),
    Q("Q16", "?a,?b,?c <- ?a wasBornIn/isLocatedIn+ Japan, ?b isConnectedTo+ ?c", Set("C2", "C5")),
    Q("Q17", "?a <- ?a isLocatedIn+/(isConnectedTo dealsWith)+ Japan", Set("C2", "C6")),
    Q("Q18", "?a,?c <- ?a isLocatedIn+ Japan, ?a isConnectedTo+ ?c", Set("C2", "C6")),
    Q("Q19", "?a <- ?a isLocatedIn+/isLocatedIn Japan", Set("C2", "C4")),
    Q("Q20", "?a <- ?a isLocatedIn+/isConnectedTo+/dealsWith+ Japan", Set("C2", "C6")),
    Q("Q21", "?a,?b <- ?a (isLocatedIn dealsWith rdfs:subClassOf isConnectedTo)+ ?b", Set("C1")),
    Q("Q22", "?a <- ?a (isConnectedTo/-isConnectedTo)+ Shannon_Airport", Set("C2")),
    Q("Q23", "?a <- ?a (wasBornIn/isLocatedIn/-wasBornIn)+ John_Lawrence_Toole", Set("C2")),
    Q("Q24", "?x <- Jay_Kappraff (livesIn/isLocatedIn/-livesIn)+ ?x", Set("C3")),
    Q("Q25", "?a,?b <- ?a (actedIn/-actedIn)+/hasChild+ ?b", Set("C6")),
  )

  /** Fig. 6 — Uniprot queries Q26..Q50. */
  val uniprot: Seq[Q] = Seq(
    Q("Q26", "?x,?y <- ?x -hasKeyword/(reference/-reference)+ ?y", Set("C5")),
    Q("Q27", "?x,?y <- ?x -hasKeyword/(encodes/-encodes)+ ?y", Set("C5")),
    Q("Q28", "?x,?y <- ?x -hasKeyword/(occurs/-occurs)+ ?y", Set("C5")),
    Q("Q29", "?x,?y <- ?x interacts/(encodes/-encodes)+ ?y", Set("C5")),
    Q("Q30", "?x,?y <- ?x interacts/(occurs/-occurs)+ ?y", Set("C5")),
    Q("Q31", "?x,?y <- ?x interacts+/(occurs/-occurs)+ ?y", Set("C6")),
    Q("Q32", "?x,?y <- ?x interacts+/(encodes/-encodes)+ ?y", Set("C6")),
    Q("Q33", "?x,?y <- ?x interacts+/(occurs/-occurs)+/(hasKeyword/-hasKeyword)+ ?y", Set("C6")),
    Q("Q34", "?x,?y <- ?x -hasKeyword/interacts/reference/(authoredBy/-authoredBy)+ ?y", Set("C5")),
    Q("Q35", "?x,?y <- ?x (encodes/-encodes)+/hasKeyword ?y", Set("C4")),
    Q("Q36", "?x <- ?x (encodes/-encodes)+ P0", Set("C2")),
    Q("Q37", "?x,?y,?z,?t <- ?x (encodes/-encodes)+ ?y, ?x interacts+ ?z, ?x reference ?t", Set("C5", "C6")),
    Q("Q38", "?x,?y <- ?x (interacts (encodes/-encodes))+ ?y, P0 (occurs/-occurs)+ ?y", Set("C3", "C6")),
    Q("Q39", "?x <- ?x interacts+/reference ?y, R0 (authoredBy/-authoredBy)+ ?y", Set("C3", "C4")),
    // the paper writes `-pub`; our generator orients publishes as
    // journal→reference, so the forward direction is the equivalent hop
    Q("Q40", "?x <- ?x interacts+/reference ?y, J0 publishes/(authoredBy/-authoredBy)+ ?y", Set("C3", "C4", "C5")),
    Q("Q41", "?x <- J0 publishes/(authoredBy/-authoredBy)+ ?x", Set("C3", "C5")),
    Q("Q42", "?x,?y <- ?x -occurs/interacts+/occurs ?y", Set("C4", "C5")),
    Q("Q43", "?x,?y <- ?x (-reference/reference)+ ?y", Set("C1")),
    Q("Q44", "?x,?y <- ?x interacts/reference/(-reference/reference)+ ?y", Set("C5")),
    Q("Q45", "?x <- P0 (reference/-reference)+ ?x", Set("C3")),
    Q("Q46", "?x,?y <- ?x (-reference/reference)+/(authoredBy publishes) ?y", Set("C4")),
    Q("Q47", "?x <- ?x (encodes/-encodes occurs/-occurs)+ P0", Set("C2")),
    Q("Q48", "?x <- P0 interacts/(encodes/-encodes occurs/-occurs)+ ?x", Set("C3", "C5")),
    Q("Q49", "?x <- P0 (encodes/-encodes)+ ?x", Set("C3")),
    Q("Q50", "?x <- P0 (occurs/-occurs)+ ?x", Set("C3")),
  )

  /** Concatenated closures a1+/a2+/…/an+ over labels l(0)…l(n-1). */
  def concatClosure(labels: Seq[String]): String = {
    val path = labels.map(_ + "+").mkString("/")
    s"?x,?y <- ?x $path ?y"
  }
}
