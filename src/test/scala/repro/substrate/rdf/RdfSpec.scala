package repro.substrate.rdf

import org.apache.spark.sql.functions._

import repro.{Oracle, SparkSpec}

/** Triple store + BGP engine tests, oracle-checked against DuckDB SQL
  * self-joins over the same triple table.
  */
class RdfSpec extends SparkSpec {
  import spark.implicits._

  private lazy val triples = Seq(
    Triple("g0", "c1", "partOf", "t1"),
    Triple("g0", "c2", "partOf", "t1"),
    Triple("g0", "c3", "partOf", "t2"),
    Triple("g0", "c4", "partOf", "t2"),
    Triple("g0", "c1", "similar", "c3", 0.9),
    Triple("g0", "c3", "similar", "c1", 0.9),
    Triple("g0", "c2", "similar", "c4", 0.7),
    Triple("g0", "c4", "similar", "c2", 0.7),
    Triple("g0", "t1", "type", "Table"),
    Triple("g0", "t2", "type", "Table"),
    Triple("p1", "s1", "calls", "pandas.read_csv"),
    Triple("p1", "s1", "next", "s2"),
    Triple("p1", "s2", "calls", "sklearn.fit"),
    Triple("p2", "s1", "calls", "pandas.read_csv"),
  )
  private lazy val store = TripleStore(spark, triples)

  private def triplesDf =
    store.df.select($"graph", $"subject", $"predicate", $"obj", $"weight")

  test("size counts triples") { assert(store.size == triples.size) }

  test("nodeCount counts distinct subjects and objects") {
    // subjects ∪ objects
    val expected = (triples.map(_.subject) ++ triples.map(_.obj)).distinct.size
    assert(store.nodeCount == expected)
  }

  test("predicateCount and countByPredicate") {
    assert(store.predicateCount == 5)
    val byP = store.countByPredicate()
    assert(byP("partOf") == 4 && byP("similar") == 4 && byP("calls") == 3)
  }

  test("single-pattern query with literal predicate (oracle)") {
    val got = store.select(Seq(TriplePattern("?c", "partOf", "?t")))
      .select($"c", $"t")
    Oracle.assertEquivalent(got,
      "SELECT subject AS c, obj AS t FROM triples WHERE predicate = 'partOf'",
      "triples" -> triplesDf)
  }

  test("two-pattern join on shared variable (oracle)") {
    val got = store.select(Seq(
      TriplePattern("?c1", "similar", "?c2"),
      TriplePattern("?c2", "partOf", "?t"),
    )).select($"c1", $"c2", $"t")
    Oracle.assertEquivalent(got,
      """SELECT a.subject AS c1, a.obj AS c2, b.obj AS t
        |FROM triples a JOIN triples b ON a.obj = b.subject
        |WHERE a.predicate = 'similar' AND b.predicate = 'partOf'""".stripMargin,
      "triples" -> triplesDf)
  }

  test("three-pattern chain (oracle)") {
    val got = store.select(Seq(
      TriplePattern("?c1", "partOf", "?t1"),
      TriplePattern("?c1", "similar", "?c2"),
      TriplePattern("?c2", "partOf", "?t2"),
    )).select($"c1", $"t1", $"c2", $"t2")
    Oracle.assertEquivalent(got,
      """SELECT a.subject AS c1, a.obj AS t1, b.obj AS c2, c.obj AS t2
        |FROM triples a
        |JOIN triples b ON a.subject = b.subject AND b.predicate = 'similar'
        |JOIN triples c ON b.obj = c.subject AND c.predicate = 'partOf'
        |WHERE a.predicate = 'partOf'""".stripMargin,
      "triples" -> triplesDf)
  }

  test("literal subject and object push-down") {
    val rows = store.select(Seq(TriplePattern("c1", "similar", "?x"))).collect()
    assert(rows.map(_.getString(0)).toSeq == Seq("c3"))
  }

  test("named-graph constraint") {
    val inP1 = store.select(Seq(
      TriplePattern(Term("?s"), Term.Lit("calls"), Term("?f"),
                    graph = Some(Term.Lit("p1")))))
    assert(inP1.count() == 2)
    val allGraphs = store.select(Seq(
      TriplePattern(Term("?s"), Term.Lit("calls"), Term("?f"),
                    graph = Some(Term.Var("g")))))
    assert(allGraphs.select("g").distinct().count() == 2)
  }

  test("weight binding (RDF-star annotation)") {
    val rows = store.select(Seq(
      TriplePattern.weighted("?c1", "similar", "?c2", "?w")))
      .filter($"w" > 0.8)
    assert(rows.count() == 2)
  }

  test("cross-join when patterns share no variables") {
    val rows = store.select(Seq(
      TriplePattern("?t", "type", "Table"),
      TriplePattern("?s", "calls", "pandas.read_csv"),
    ))
    assert(rows.count() == 4) // 2 tables × 2 statements
  }

  test("empty BGP is rejected") {
    intercept[IllegalArgumentException] { store.select(Seq.empty) }
  }

  test("union combines stores") {
    val extra = TripleStore(spark, Seq(Triple("g9", "x", "p", "y")))
    assert(store.union(extra).size == triples.size + 1)
  }

  test("approxSerializedBytes is positive and grows") {
    val b = store.approxSerializedBytes
    assert(b > 0)
    assert(store.union(store).approxSerializedBytes > b)
  }

  test("local index agrees with the store") {
    val idx = LocalGraphIndex.fromStore(store)
    assert(idx.objectsOf("c1", "similar") == Seq(("c3", 0.9)))
    assert(idx.edgesOf("partOf").toSet ==
      Set(("c1", "t1", 1.0), ("c2", "t1", 1.0), ("c3", "t2", 1.0), ("c4", "t2", 1.0)))
    assert(idx.subjectsOf("type").toSet == Set("t1", "t2"))
    assert(idx.objectsOf("nope", "similar").isEmpty)
  }

  test("fromDF validates layout") {
    intercept[IllegalArgumentException] {
      TripleStore.fromDF(spark, Seq((1, 2)).toDF("a", "b"))
    }
  }
}
