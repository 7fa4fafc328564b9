package repro.core.automl

import org.apache.spark.sql.functions._

import repro.{Oracle, SparkSpec}

/** The 5 cleaning operators, oracle-checked where SQL-expressible. */
class CleaningOpsSpec extends SparkSpec {
  import spark.implicits._

  private lazy val df = Seq(
    (Some(1.0), Some(10.0), Some("a")),
    (Some(2.0), None, Some("b")),
    (None, Some(30.0), Some("a")),
    (Some(4.0), Some(40.0), None),
    (Some(5.0), None, Some("a")),
  ).toDF("x", "y", "cat")
  private val cols = Seq("x", "y", "cat")

  test("fillna: zeros and 'missing' constants (oracle)") {
    val got = CleaningOps.fillna(df, cols)
    Oracle.assertEquivalent(got,
      """SELECT coalesce(CAST(x AS DOUBLE), 0.0) AS x,
        |       coalesce(CAST(y AS DOUBLE), 0.0) AS y,
        |       coalesce(cat, 'missing') AS cat FROM t""".stripMargin,
      "t" -> df)
  }
  test("simpleImputer: mean for numerics, mode for strings (oracle)") {
    val got = CleaningOps.simpleImputer(df, cols)
    Oracle.assertEquivalent(got,
      """SELECT coalesce(CAST(x AS DOUBLE), (SELECT avg(CAST(x AS DOUBLE)) FROM t)) AS x,
        |       coalesce(CAST(y AS DOUBLE), (SELECT avg(CAST(y AS DOUBLE)) FROM t)) AS y,
        |       coalesce(cat, 'a') AS cat FROM t""".stripMargin,
      "t" -> df)
  }
  test("interpolate: missing cell becomes neighbour average") {
    val got = CleaningOps.interpolate(df, cols).select("x").as[Double].collect()
    assert(got(2) == 3.0) // between 2.0 and 4.0
  }
  test("interpolate: edges fall back one-sided") {
    val edge = Seq(Option.empty[Double], Some(2.0), Some(4.0), None)
      .toDF("x")
    val got = CleaningOps.interpolate(edge, Seq("x")).as[Double].collect()
    assert(got(0) == 2.0) // first: next non-null
    assert(got(3) == 4.0) // last: prev non-null
  }
  test("all operators remove every null") {
    CleaningOps.All.foreach { op =>
      val cleaned = CleaningOps(op, df, cols)
      val nulls = cols.map(c => cleaned.filter(col(c).isNull).count()).sum
      assert(nulls == 0, s"$op left $nulls nulls")
    }
  }
  test("knnImputer fills from nearest complete rows") {
    // two tight clusters; the missing y must come from its own cluster
    val clustered = Seq(
      (1.0, Some(100.0)), (1.1, Some(101.0)), (0.9, Some(99.0)), (1.05, None),
      (10.0, Some(500.0)), (10.1, Some(501.0)), (9.9, Some(499.0)),
    ).toDF("x", "y")
    val got = CleaningOps.knnImputer(clustered, Seq("x", "y"), k = 3)
      .filter($"x" === 1.05).select("y").as[Double].collect().head
    assert(got > 95 && got < 105, s"imputed $got should be near cluster 1")
  }
  test("iterativeImputer reconstructs a linear relationship") {
    val rng = new scala.util.Random(7)
    val rows = (1 to 300).map { i =>
      val a = rng.nextGaussian(); val b = rng.nextGaussian()
      val y = 2.0 * a - b + rng.nextGaussian() * 0.01
      (a, b, if (i % 5 == 0) None else Some(y))
    }
    val d = spark.createDataFrame(rows).toDF("a", "b", "y")
    val got = CleaningOps.iterativeImputer(d, Seq("a", "b", "y"))
    // check imputations track 2a - b
    val errs = got.filter($"y".isNotNull)
      .select(abs($"y" - (lit(2.0) * $"a" - $"b"))).as[Double].collect()
    val meanErr = errs.sum / errs.length
    assert(meanErr < 0.5, s"mean reconstruction error $meanErr")
  }
  test("iterativeImputer beats mean imputation on correlated data") {
    val rng = new scala.util.Random(8)
    val truth = (1 to 400).map { _ =>
      val a = rng.nextGaussian(); val b = rng.nextGaussian()
      (a, b, 2.0 * a - b + rng.nextGaussian() * 0.05)
    }
    val withNulls = truth.zipWithIndex.map { case ((a, b, y), i) =>
      (a, b, if (i % 4 == 0) None else Some(y), y)
    }
    val d = spark.createDataFrame(withNulls).toDF("a", "b", "y", "truth")
    def err(cleaned: org.apache.spark.sql.DataFrame): Double = {
      val es = cleaned.select(abs($"y" - $"truth")).as[Double].collect()
      es.sum / es.length
    }
    val iterErr = err(CleaningOps.iterativeImputer(d, Seq("a", "b", "y")))
    val meanErr = err(CleaningOps.simpleImputer(d, Seq("a", "b", "y")))
    assert(iterErr < meanErr, s"iterative $iterErr vs mean $meanErr")
  }
  test("unknown operation is rejected") {
    intercept[IllegalArgumentException] { CleaningOps("Nope", df, cols) }
  }
  test("solveInPlace solves a 3x3 system and detects singularity") {
    val a = Array(Array(2.0, 0.0, 0.0), Array(0.0, 3.0, 0.0), Array(0.0, 0.0, 4.0))
    val x = CleaningOps.solveInPlace(a, Array(2.0, 6.0, 12.0)).get
    assert(x.toSeq == Seq(1.0, 2.0, 3.0))
    val singular = Array(Array(1.0, 1.0), Array(1.0, 1.0))
    assert(CleaningOps.solveInPlace(singular, Array(1.0, 2.0)).isEmpty)
  }
}
