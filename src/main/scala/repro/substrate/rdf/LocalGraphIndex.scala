package repro.substrate.rdf

/** Driver-side adjacency index over a (small) triple graph — the
  * stand-in for GraphDB's built-in native indices that make the paper's
  * SPARQL discovery queries millisecond-fast (§6.1.2).
  *
  * The Spark [[TripleStore]] is the system of record and the BGP engine
  * its query path; discovery-serving loads the dataset graph into this
  * index once (the analogue of loading the constructed KG into the RDF
  * engine) and answers point lookups without job-launch overhead.
  * Tests assert both paths return identical results.
  */
final class LocalGraphIndex private (
    /** predicate → subject → (object, weight) list. */
    val spo: Map[String, Map[String, Seq[(String, Double)]]],
) {

  /** Objects (with weights) linked from `subject` via `predicate`. */
  def objectsOf(subject: String, predicate: String): Seq[(String, Double)] =
    spo.getOrElse(predicate, Map.empty).getOrElse(subject, Seq.empty)

  /** All (subject, object, weight) edges of a predicate. */
  def edgesOf(predicate: String): Seq[(String, String, Double)] =
    spo.getOrElse(predicate, Map.empty).iterator.flatMap { case (s, os) =>
      os.map { case (o, w) => (s, o, w) }
    }.toSeq

  /** Subjects that have any edge of `predicate`. */
  def subjectsOf(predicate: String): Iterable[String] =
    spo.getOrElse(predicate, Map.empty).keys
}

object LocalGraphIndex {

  /** Load a triple store's default graph into the index. */
  def fromStore(store: TripleStore): LocalGraphIndex = fromTriples(
    store.df.collect().iterator.map { r =>
      Triple(r.getString(0), r.getString(1), r.getString(2), r.getString(3), r.getDouble(4))
    }.toSeq)

  def fromTriples(triples: Seq[Triple]): LocalGraphIndex = {
    val spo = triples
      .groupBy(_.predicate)
      .map { case (p, ts) =>
        p -> ts.groupBy(_.subject).map { case (s, g) =>
          s -> g.map(t => (t.obj, t.weight))
        }
      }
    new LocalGraphIndex(spo)
  }
}
