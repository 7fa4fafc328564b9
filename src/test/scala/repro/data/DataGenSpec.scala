package repro.data

import org.apache.spark.sql.functions._

import repro.SparkSpec
import repro.core.automl.CleaningOps
import repro.substrate.python.PyParser

/** Synthetic benchmark generators: lakes, ML datasets, pipeline corpus. */
class DataGenSpec extends SparkSpec {

  // --------------------------------------------------------------- lakes
  private lazy val lake = LakeBench.generate(
    LakeBench.Spec("mini", nFamilies = 4, partitionsPerFamily = 3, baseRows = 120,
                   colsMin = 5, colsMax = 7, hard = false, nQuery = 3, seed = 99))
  private lazy val hardLake = LakeBench.generate(
    LakeBench.Spec("mini_hard", 3, 3, 120, 5, 7, hard = true, nQuery = 2, seed = 98))

  test("lake has nFamilies × partitions tables") {
    assert(lake.tables.size == 12)
  }
  test("lake generation is deterministic") {
    val again = LakeBench.generate(
      LakeBench.Spec("mini", 4, 3, 120, 5, 7, hard = false, nQuery = 3, seed = 99))
    assert(again.tables.map(_.name) == lake.tables.map(_.name))
    assert(again.tables.head.rows == lake.tables.head.rows)
  }
  test("ground truth: partitions of a family are mutually unionable") {
    val q = lake.queryTables.head
    val gt = lake.unionableGroundTruth(q)
    assert(gt.size == 2)
    assert(gt.forall(t => lake.familyOf(t) == lake.familyOf(q)))
  }
  test("partitions keep at least 3 columns and ≥20 rows") {
    assert(lake.tables.forall(_.columns.size >= 3))
    assert(lake.tables.forall(_.rowCount >= 20))
  }
  test("same-family partitions share column archetypes") {
    val fam = lake.tables.groupBy(t => lake.familyOf(t.name)).head._2
    val shared = fam.map(_.columns.toSet).reduce(_ intersect _)
    assert(shared.nonEmpty)
  }
  test("hard lake renames columns with synonyms") {
    val fams = hardLake.tables.groupBy(t => hardLake.familyOf(t.name))
    // across a family's partitions, at least one column name differs
    assert(fams.values.exists(ts => ts.map(_.columns.toSet).distinct.size > 1))
  }
  test("cells view matches table contents") {
    val cells = lake.cells(spark)
    val expected = lake.tables.map(t => t.rowCount.toLong * t.columns.size).sum
    assert(cells.count() == expected)
    assert(cells.select("table").distinct().count() == lake.tables.size)
  }
  test("lake statistics are sane") {
    assert(lake.totalSizeBytes > 0)
    assert(lake.avgRows > 20)
    assert(lake.totalColumns >= lake.tables.size * 3)
    assert(lake.avgUnionable == 2.0)
  }

  // --------------------------------------------------------- ML datasets
  test("cleaning benchmark has 13 datasets with ascending sizes") {
    val b = MlDatasets.cleaningBenchmark
    assert(b.size == 13)
    assert(b.map(_.id) == (1 to 13))
  }
  test("transformation benchmark has 17 datasets") {
    assert(MlDatasets.transformBenchmark.size == 17)
    assert(MlDatasets.transformBenchmark.map(_.id) == (14 to 30))
  }
  test("cleaning dataset materializes with nulls and labels") {
    val d  = MlDatasets.cleaningBenchmark.head
    val df = d.generate(spark).cache()
    assert(df.count() == d.rows)
    val nullCells = d.featureCols.map(c =>
      df.filter(col(c).isNull).count()).sum
    assert(nullCells > 0, "missing values must be injected")
    assert(df.select("label").distinct().count() == d.nClasses)
    df.unpersist()
  }
  test("mostly_missing datasets break the drop-nulls baseline") {
    val d  = MlDatasets.cleaningBenchmark.find(_.family == "mostly_missing").get
    val df = d.generate(spark)
    val survivors = df.na.drop(d.featureCols).count()
    assert(survivors < d.rows / 10, s"dropna must devastate: $survivors of ${d.rows}")
  }
  test("transformation datasets have no nulls") {
    val d  = MlDatasets.transformBenchmark.head
    val df = d.generate(spark)
    assert(df.na.drop(d.featureCols).count() == d.rows)
  }
  test("dataset generation is deterministic") {
    val d = MlDatasets.cleaningBenchmark(2)
    val a = d.generate(spark).collect().map(_.toSeq)
    val b = d.generate(spark).collect().map(_.toSeq)
    assert(a.sameElements(b))
  }
  test("training corpora cover all families, disjoint from benchmarks") {
    val c = MlDatasets.cleaningTrainingCorpus()
    assert(c.map(_.family).distinct.sorted ==
      Seq("cluster", "correlated", "mcar", "mostly_missing", "smooth"))
    assert(c.map(_.name).toSet.intersect(
      MlDatasets.cleaningBenchmark.map(_.name).toSet).isEmpty)
    val t = MlDatasets.transformTrainingCorpus()
    assert(t.map(_.family).distinct.sorted == Seq("minmax", "robust", "std"))
  }

  // ------------------------------------------------------ pipeline corpus
  private lazy val corpus = PipelineCorpus.forDatasets(
    MlDatasets.cleaningTrainingCorpus(2).map(PipelineCorpus.refOf), per = 3, seed = 5)

  test("corpus size and metadata") {
    assert(corpus.size == 30) // 5 families × 2 × 3
    assert(corpus.forall(_.votes >= 0))
    assert(corpus.forall(r => r.score > 0 && r.score < 1))
    assert(corpus.map(_.id).distinct.size == corpus.size)
  }
  test("every generated script parses without opaque fallbacks") {
    corpus.foreach { r =>
      val stmts = PyParser.parse(r.script)
      assert(stmts.nonEmpty)
      val opaque = stmts.collect {
        case repro.substrate.python.PyAst.PyExprStmt(
          repro.substrate.python.PyAst.PyOpaque(t), _, _, _) => t
      }
      assert(opaque.isEmpty, s"opaque lines in ${r.id}: $opaque")
    }
  }
  test("scripts read their dataset's csv") {
    corpus.foreach { r =>
      assert(r.script.contains(s"pd.read_csv('${r.dataset}/data.csv')"))
    }
  }
  test("majority of pipelines use the family's best cleaning op") {
    val mostly = corpus.count { r =>
      val best = MlDatasets.cleaningTrainingCorpus(2)
        .find(_.name == r.dataset).get.bestCleaning
      best match {
        case CleaningOps.Fillna           => r.script.contains(".fillna(")
        case CleaningOps.Interpolate      => r.script.contains(".interpolate(")
        case CleaningOps.SimpleImputer    => r.script.contains("SimpleImputer(")
        case CleaningOps.KnnImputer       => r.script.contains("KNNImputer(")
        case CleaningOps.IterativeImputer => r.script.contains("IterativeImputer(")
      }
    }
    assert(mostly >= corpus.size / 2)
  }
  test("abstraction corpus produces the requested count") {
    val c = PipelineCorpus.abstractionCorpus(25, seed = 7)
    assert(c.size == 25)
    assert(c.map(_.id).distinct.size == 25)
  }
}
