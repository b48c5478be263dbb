package repro.ucrpq

/** Regular path expressions of UCRPQs (Sec. III / V-D of the paper). */
sealed trait Path
/** A forward edge label `a`. */
final case class Label(name: String) extends Path
/** An inverse edge label `-a`. */
final case class Inv(name: String) extends Path
/** Concatenation `p1/p2/…`. */
final case class Concat(items: List[Path]) extends Path
/** Alternation `(p1|p2|…)` (the paper also writes space-separated). */
final case class Alt(alternatives: List[Path]) extends Path
/** Transitive closure `p+`. */
final case class Plus(p: Path) extends Path

/** Endpoint of a conjunct: a variable `?x` or a node constant. */
sealed trait Endpoint
final case class QVar(name: String) extends Endpoint
final case class QConst(name: String) extends Endpoint

/** One regular path atom `left path right`. */
final case class Conjunct(left: Endpoint, path: Path, right: Endpoint)

/** A conjunctive regular path query `?h1,… ← conj1, conj2, …`. */
final case class Query(heads: List[String], conjuncts: List[Conjunct])
