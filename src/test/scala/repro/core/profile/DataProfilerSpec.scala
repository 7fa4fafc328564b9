package repro.core.profile

import org.apache.spark.sql.functions._

import repro.{Oracle, SparkSpec}
import repro.core.embed.{ColrModel, TableEmbedding}

/** Data profiling (Alg. 2) on Spark, with DuckDB oracle checks on the
  * statistics the profiler computes.
  */
class DataProfilerSpec extends SparkSpec {
  import spark.implicits._

  private lazy val df = Seq(
    (Some(25), Some("Canada"), Some("great product really"), Some(true), Some("2020-01-05")),
    (Some(37), Some("France"), Some("bad quality terrible"), Some(false), Some("2020-03-05")),
    (None, Some("Japan"), Some("love it works perfectly"), Some(true), Some("2021-07-15")),
    (Some(41), None, Some("would not recommend this"), Some(true), None),
    (Some(29), Some("Brazil"), None, Some(false), Some("2019-11-30")),
  ).toDF("age", "country", "review", "active", "signup_date")
    .select($"age", $"country", $"review", $"active", $"signup_date")

  private lazy val profiles =
    DataProfiler.profileTable(spark, "shop", "customers", df)

  test("one profile per column") {
    assert(profiles.map(_.columnName).sorted ==
      Seq("active", "age", "country", "review", "signup_date"))
  }
  test("membership metadata is set") {
    assert(profiles.forall(_.datasetName == "shop"))
    assert(profiles.forall(_.tableName == "customers"))
    assert(profiles.head.tableId == "shop/customers")
    assert(profiles.head.columnId.startsWith("shop/customers/"))
  }
  test("fine-grained types are inferred per column") {
    val t = profiles.map(p => p.columnName -> p.fgType).toMap
    assert(t("age") == FineGrainedType.Int)
    assert(t("country") == FineGrainedType.NamedEntity)
    assert(t("review") == FineGrainedType.NaturalLanguage)
    assert(t("active") == FineGrainedType.Boolean)
    assert(t("signup_date") == FineGrainedType.Date)
  }
  test("total and null counts are exact (oracle)") {
    val got = spark.createDataFrame(
      profiles.map(p => (p.columnName, p.totalCount, p.nullCount)))
      .toDF("col", "total", "nulls")
    Oracle.assertEquivalent(got,
      """SELECT 'age' AS col, count(*) AS total, count(*) - count(age) AS nulls FROM customers
        |UNION ALL SELECT 'country', count(*), count(*) - count(country) FROM customers
        |UNION ALL SELECT 'review', count(*), count(*) - count(review) FROM customers
        |UNION ALL SELECT 'active', count(*), count(*) - count(active) FROM customers
        |UNION ALL SELECT 'signup_date', count(*), count(*) - count(signup_date) FROM customers
        |""".stripMargin,
      "customers" -> df)
  }
  test("numeric statistics match the sample") {
    val age = profiles.find(_.columnName == "age").get
    assert(math.abs(age.mean - 33.0) < 1e-9) // (25+37+41+29)/4
    assert(age.minVal == 25.0 && age.maxVal == 41.0)
  }
  test("boolean true-ratio") {
    val act = profiles.find(_.columnName == "active").get
    assert(math.abs(act.trueRatio - 0.6) < 1e-9)
  }
  test("distinct counts are approximately right") {
    val c = profiles.find(_.columnName == "country").get
    assert(c.distinctCount >= 3 && c.distinctCount <= 5)
  }
  test("embeddings have the right dimensionality") {
    assert(profiles.forall(_.embedding.length == ColrModel.Dim))
    assert(profiles.forall(_.labelEmbedding.length == 50))
  }
  test("profiling is deterministic") {
    val again = DataProfiler.profileTable(spark, "shop", "customers", df)
    profiles.zip(again).foreach { case (a, b) =>
      assert(a.columnName == b.columnName)
      assert(a.fgType == b.fgType)
      assert(a.embedding.sameElements(b.embedding))
    }
  }
  test("cellsOf produces one cell per (row, column)") {
    val cells = DataProfiler.cellsOf(spark, "shop", "customers", df)
    assert(cells.count() == 25)
    assert(cells.filter(col("value").isNull).count() == 4)
  }
  test("profileCells scales over multiple tables in one pass") {
    val cells = DataProfiler.cellsOf(spark, "shop", "customers", df)
      .union(DataProfiler.cellsOf(spark, "shop", "orders",
        Seq((1, 9.99), (2, 19.99)).toDF("order_id", "total")))
    val ps = DataProfiler.profileCells(spark, cells).collect()
    assert(ps.length == 7)
    assert(ps.count(_.tableName == "orders") == 2)
  }
  test("table embedding (Eq. 1) concatenates per-type means") {
    val emb = TableEmbedding.fromProfiles(profiles)
    assert(emb.length == TableEmbedding.Dim)
    // the int block is exactly the age column's embedding
    val age = profiles.find(_.columnName == "age").get
    assert(emb.take(ColrModel.Dim).sameElements(age.embedding))
  }
  test("missing-value table embedding aggregates only null-bearing columns") {
    val emb  = TableEmbedding.forMissingValueColumns(profiles)
    val withNulls = profiles.filter(_.nullCount > 0)
    assert(withNulls.nonEmpty)
    val expected = TableEmbedding.fromProfiles(withNulls)
    assert(emb.sameElements(expected))
  }
}
