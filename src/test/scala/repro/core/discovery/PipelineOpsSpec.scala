package repro.core.discovery

import repro.SparkSpec
import repro.core.automl.AutomationTrainer
import repro.data.{MlDatasets, PipelineCorpus}

/** Pre-defined operations over pipeline named graphs (§5): library
  * usage statistics, pipeline search, classifier recommendation.
  */
class PipelineOpsSpec extends SparkSpec {

  private lazy val datasets = MlDatasets.cleaningTrainingCorpus(2)
  private lazy val (store, _) =
    AutomationTrainer.buildKg(spark, datasets, pipelinesPer = 3, seed = 9)

  test("get_top_k_library_used ranks pandas and sklearn at the top") {
    val top = PredefinedOps.getTopKLibraryUsed(store, 5).collect()
    assert(top.nonEmpty)
    val libs = top.map(_.getString(0)).toSeq
    assert(libs.contains("pandas"), s"got $libs")
    assert(libs.contains("sklearn"), s"got $libs")
    // counts descend
    val counts = top.map(_.getLong(1))
    assert(counts.toSeq == counts.sorted.reverse.toSeq)
  }
  test("library usage counts unique pipelines, not call sites") {
    val top = PredefinedOps.getTopKLibraryUsed(store, 3).collect()
    val total = datasets.size * 3L
    assert(top.forall(_.getLong(1) <= total))
  }
  test("get_pipelines_calling_libraries intersects all given paths") {
    val both = PredefinedOps.getPipelinesCallingLibraries(store, Seq(
      "pandas.read_csv", "sklearn.model_selection.train_test_split")).collect()
    assert(both.nonEmpty)
    // votes column is populated and sorted descending
    val votes = both.map(_.getInt(2))
    assert(votes.toSeq == votes.sorted.reverse.toSeq)
  }
  test("pipelines calling a never-used library is empty") {
    assert(PredefinedOps.getPipelinesCallingLibraries(store,
      Seq("sklearn.cluster.KMeans")).count() == 0)
  }
  test("recommend_ml_models returns estimators used on the dataset with scores") {
    val d = datasets.head
    val (cls, module, _) = PipelineCorpus.estimatorFor(d.name)
    val rec = PredefinedOps.recommendMlModels(store, d.name,
      Seq(s"$module.$cls", "sklearn.svm.SVC")).collect()
    assert(rec.nonEmpty)
    assert(rec.head.getString(0).endsWith(cls))
    assert(rec.head.getDouble(1) > 0.0 && rec.head.getDouble(1) < 1.0)
  }
  test("recommend_ml_models for an unknown dataset is empty") {
    assert(PredefinedOps.recommendMlModels(store, "no_such_dataset",
      Seq("xgboost.XGBClassifier")).count() == 0)
  }
}
