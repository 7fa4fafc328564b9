package repro.substrate.rdf

/** One RDF-star edge of the LiDS graph.
  *
  * `graph` is the named graph (each abstracted pipeline lives in its own
  * named graph, per §2.1); `weight` carries the RDF-star edge annotation
  * the paper uses for similarity scores (1.0 for plain edges).
  */
case class Triple(
    graph: String,
    subject: String,
    predicate: String,
    obj: String,
    weight: Double = 1.0,
)

/** A term of a triple pattern: either a variable (`?name`) or a literal. */
sealed trait Term {
  def fold[A](ifVar: String => A, ifLit: String => A): A = this match {
    case Term.Var(n) => ifVar(n)
    case Term.Lit(v) => ifLit(v)
  }
}

object Term {
  final case class Var(name: String)  extends Term
  final case class Lit(value: String) extends Term

  /** Parse SPARQL-style shorthand: strings starting with `?` are vars. */
  def apply(s: String): Term =
    if (s.startsWith("?")) Var(s.drop(1)) else Lit(s)
}

/** A basic-graph-pattern triple pattern, optionally constraining the
  * named graph and binding the RDF-star weight to a variable.
  */
case class TriplePattern(
    s: Term,
    p: Term,
    o: Term,
    graph: Option[Term] = None,
    weightVar: Option[String] = None,
)

object TriplePattern {
  /** SPARQL-ish shorthand: `TriplePattern("?col", "rdf:type", "kglids:Column")`. */
  def apply(s: String, p: String, o: String): TriplePattern =
    TriplePattern(Term(s), Term(p), Term(o))

  /** Shorthand with a weight-binding variable (RDF-star annotation). */
  def weighted(s: String, p: String, o: String, weightVar: String): TriplePattern =
    TriplePattern(Term(s), Term(p), Term(o), weightVar = Some(weightVar.stripPrefix("?")))
}
