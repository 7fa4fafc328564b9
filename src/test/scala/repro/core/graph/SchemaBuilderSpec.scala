package repro.core.graph

import repro.{Oracle, SparkSpec}
import repro.core.profile.DataProfiler
import repro.substrate.rdf.TripleStore

/** Data Global Schema construction (Alg. 3). */
class SchemaBuilderSpec extends SparkSpec {
  import spark.implicits._

  // two unionable tables (same archetypes, shared values) + one unrelated
  private lazy val t1 = Seq(
    ("Canada", 10.5, true, "great product quality"),
    ("France", 11.0, true, "really good value"),
    ("Japan", 9.75, false, "bad quality terrible"),
    ("Brazil", 10.25, true, "love this product"),
  ).toDF("country", "price", "in_stock", "review")

  private lazy val t2 = Seq(
    ("Canada", 10.4, true, "good product overall"),
    ("Japan", 10.9, true, "terrible would avoid"),
    ("Spain", 9.5, false, "great quality nice"),
  ).toDF("nation", "cost", "in_stock", "review_text")

  private lazy val t3 = Seq(
    ("PRD-1", "2020-01-01", 170.0),
    ("PRD-2", "2020-02-01", 180.5),
    ("PRD-3", "2020-03-01", 160.25),
  ).toDF("sku", "listed_on", "height_cm")

  private lazy val profiles = DataProfiler.profileCells(spark,
    DataProfiler.cellsOf(spark, "lake", "t1", t1)
      .union(DataProfiler.cellsOf(spark, "lake", "t2", t2))
      .union(DataProfiler.cellsOf(spark, "lake", "t3", t3))).cache()

  private lazy val th = SchemaBuilder.Thresholds(alpha = 0.8, beta = 0.9, theta = 0.35)
  private lazy val metadata = SchemaBuilder.metadataGraph(spark, profiles).collect().toSeq
  private lazy val sims     = SchemaBuilder.similarityGraph(spark, profiles, th).collect().toSeq

  test("metadata graph has type triples for dataset, tables, columns") {
    assert(metadata.count(t => t.predicate == Lids.Prop.RdfType && t.obj == Lids.Cls.Dataset) == 1)
    assert(metadata.count(t => t.predicate == Lids.Prop.RdfType && t.obj == Lids.Cls.Table) == 3)
    assert(metadata.count(t => t.predicate == Lids.Prop.RdfType && t.obj == Lids.Cls.Column) == 11)
  }
  test("metadata graph hierarchy: every column isPartOf its table (oracle)") {
    val got = spark.createDataFrame(metadata
      .filter(t => t.predicate == Lids.Prop.IsPartOf && t.subject.count(_ == '/') > 5)
      .map(t => (t.subject, t.obj))).toDF("col_uri", "table_uri")
    val cols = spark.createDataFrame(Seq(
      "t1/country", "t1/price", "t1/in_stock", "t1/review",
      "t2/nation", "t2/cost", "t2/in_stock", "t2/review_text",
      "t3/sku", "t3/listed_on", "t3/height_cm").map(c => Tuple1(c))).toDF("c")
    Oracle.assertEquivalent(got,
      s"""SELECT 'http://kglids.org/resource/lake/' || c AS col_uri,
         |'http://kglids.org/resource/lake/' ||
         |  substr(c, 1, instr(c, '/') - 1) AS table_uri FROM cols""".stripMargin,
      "cols" -> cols)
  }
  test("statistics triples carry exact missing counts") {
    val missing = metadata.filter(_.predicate == Lids.Prop.HasMissingCount)
    assert(missing.size == 11)
    assert(missing.forall(_.obj == "0"))
  }
  test("boolean columns carry a true-ratio triple") {
    assert(metadata.count(_.predicate == Lids.Prop.HasTrueRatio) == 2)
  }
  test("label similarity links synonym-renamed columns") {
    val labelEdges = sims.filter(_.predicate == Lids.Prop.LabelSimilarity)
    def has(a: String, b: String) = labelEdges.exists(t =>
      t.subject.endsWith(a) && t.obj.endsWith(b))
    assert(has("t1/country", "t2/nation"), "country≈nation (synonyms)")
    assert(has("t1/price", "t2/cost"), "price≈cost (synonyms)")
    assert(has("t1/in_stock", "t2/in_stock"), "identical labels")
  }
  test("content similarity links value-overlapping columns") {
    val contentEdges = sims.filter(_.predicate == Lids.Prop.ContentSimilarity)
    assert(contentEdges.exists(t =>
      t.subject.endsWith("t1/country") && t.obj.endsWith("t2/nation")))
  }
  test("no similarity edges within the same table") {
    def tableOf(uri: String) = uri.split('/').dropRight(1).mkString("/")
    assert(sims.forall(t => tableOf(t.subject) != tableOf(t.obj)))
  }
  test("no similarity edges across fine-grained types") {
    val typeOf = profiles.collect().map(p =>
      (Lids.ResourcePrefix + p.columnId) -> p.fgType).toMap
    assert(sims.forall(t => typeOf(t.subject) == typeOf(t.obj)))
  }
  test("unrelated table stays unlinked to label-similar edges") {
    assert(!sims.exists(t =>
      t.predicate == Lids.Prop.LabelSimilarity &&
        (t.subject.contains("/t3/") || t.obj.contains("/t3/"))))
  }
  test("edges are symmetric with equal weights") {
    val set = sims.map(t => (t.subject, t.predicate, t.obj, t.weight)).toSet
    assert(sims.forall(t => set.contains((t.obj, t.predicate, t.subject, t.weight))))
  }
  test("edge weights are genuine scores above thresholds") {
    assert(sims.filter(_.predicate == Lids.Prop.LabelSimilarity).forall(_.weight >= th.alpha))
    assert(sims.nonEmpty)
  }
  test("higher thresholds yield fewer edges (precision/recall lever)") {
    val strict = SchemaBuilder.similarityGraph(spark, profiles,
      SchemaBuilder.Thresholds(alpha = 0.999, beta = 0.999, theta = 0.999)).count()
    assert(strict <= sims.size)
  }
  test("full build = metadata ∪ similarity, loadable as a triple store") {
    val store = TripleStore.fromDataset(SchemaBuilder.build(spark, profiles, th))
    assert(store.size == metadata.size + sims.size)
    assert(store.countByPredicate().contains(Lids.Prop.IsPartOf))
  }
}
