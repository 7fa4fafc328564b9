package repro.substrate.rdf

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Compiles a SPARQL basic graph pattern into DataFrame joins.
  *
  * Each [[TriplePattern]] becomes a scan of the triple DataFrame with
  * literal positions pushed down as filters and variable positions
  * projected out under the variable's name; consecutive patterns are
  * inner-joined on their shared variables (cross join when disjoint —
  * as in SPARQL). The result is a binding table with one column per
  * variable, which pre-defined operations convert to user-facing
  * DataFrames (the paper's "query results as Pandas DataFrame").
  */
object BgpEngine {

  /** Evaluate `patterns` over `triples` (layout: graph, subject,
    * predicate, obj, weight). Returns the variable-binding table.
    */
  def query(triples: DataFrame, patterns: Seq[TriplePattern]): DataFrame = {
    require(patterns.nonEmpty, "empty BGP")
    val scans = patterns.map(scan(triples, _))
    scans.reduceLeft { (acc, next) =>
      val shared = acc.columns.toSet intersect next.columns.toSet
      if (shared.isEmpty) acc.crossJoin(next)
      else acc.join(next, shared.toSeq, "inner")
    }
  }

  /** One pattern → filtered + projected scan. */
  private def scan(triples: DataFrame, p: TriplePattern): DataFrame = {
    var df = triples
    // Push literal constraints down.
    p.s.fold(_ => (), v => df = df.filter(col("subject") === v))
    p.p.fold(_ => (), v => df = df.filter(col("predicate") === v))
    p.o.fold(_ => (), v => df = df.filter(col("obj") === v))
    p.graph.foreach(_.fold(_ => (), v => df = df.filter(col("graph") === v)))

    // Project variables. Duplicated variables inside one pattern become
    // equality filters (?x ?p ?x).
    val positionVars: Seq[(String, Term)] =
      Seq("subject" -> p.s, "predicate" -> p.p, "obj" -> p.o) ++
        p.graph.map("graph" -> _)
    val varCols = positionVars.collect { case (c, Term.Var(n)) => (c, n) }
    varCols.groupBy(_._2).values.filter(_.size > 1).foreach { dups =>
      dups.sliding(2).foreach {
        case Seq((c1, _), (c2, _)) => df = df.filter(col(c1) === col(c2))
        case _                     =>
      }
    }
    val projected = varCols.map(_._2).distinct.map { v =>
      col(varCols.find(_._2 == v).get._1).as(v)
    } ++ p.weightVar.map(wv => col("weight").as(wv))
    require(projected.nonEmpty, s"pattern binds no variables: $p")
    df.select(projected: _*)
  }
}
