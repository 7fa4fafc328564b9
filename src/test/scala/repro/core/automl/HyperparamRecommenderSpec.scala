package repro.core.automl

import repro.SparkSpec
import repro.core.embed.TableEmbedding
import repro.data.{MlDatasets, PipelineCorpus}
import repro.substrate.baselines.KgpipLike
import repro.substrate.ml.VectorIndex

/** Hyperparameter recommendation from the LiDS graph (§4.4) and the
  * KGpip integration (Pip_LiDS vs Pip_G4C, Fig. 9's mechanism).
  */
class HyperparamRecommenderSpec extends SparkSpec {

  private lazy val datasets = MlDatasets.cleaningTrainingCorpus(2)
  private lazy val trained  = AutomationTrainer.trainOn(spark, datasets, pipelinesPer = 6, seed = 3)

  test("params of estimator calls on a table are recoverable") {
    val d = datasets.head
    val (cls, module, _) = PipelineCorpus.estimatorFor(d.name)
    val params = HyperparamRecommender.paramsUsedWith(
      trained.store, s"${d.name}/data", s"$module.$cls", topPipelines = 10)
    assert(params.nonEmpty)
  }
  test("recommendation returns the community-typical values") {
    val d = datasets.head
    val (cls, module, grid) = PipelineCorpus.estimatorFor(d.name)
    val emb = TableEmbedding.fromProfiles(trained.profilesByTable(s"${d.name}/data"))
    val rec = HyperparamRecommender.recommend(
      trained.store, trained.tableIndex, emb, s"$module.$cls")
    assert(rec.nonEmpty)
    // typical value (70% of pipelines) should win the vote for some hp
    val typical = grid.map { case (k, vs) => k -> vs.head }.toMap
    val agree = rec.count { case (k, v) => typical.get(k).contains(v) }
    assert(agree >= 1, s"recommended $rec vs typical $typical")
  }
  test("defaults recovered by documentation analysis are included") {
    val d = datasets.head
    val (cls, module, _) = PipelineCorpus.estimatorFor(d.name)
    val params = HyperparamRecommender.paramsUsedWith(
      trained.store, s"${d.name}/data", s"$module.$cls", topPipelines = 10)
    val names = params.map(_._1).toSet
    // e.g. RandomForestClassifier's criterion/min_samples_leaf defaults,
    // LogisticRegression's penalty, XGB's learning_rate… at least one
    // parameter beyond the two the scripts pass explicitly
    assert(names.size > 2, s"expected defaults among $names")
  }
  test("recommendation for an unknown estimator is empty") {
    val emb = Array.fill(TableEmbedding.Dim)(0.5)
    val rec = HyperparamRecommender.recommend(
      trained.store, trained.tableIndex, emb, "sklearn.cluster.KMeans")
    assert(rec.isEmpty)
  }
  test("recommendation with an empty index is empty") {
    val rec = HyperparamRecommender.recommend(
      trained.store, new VectorIndex(TableEmbedding.Dim),
      Array.fill(TableEmbedding.Dim)(0.1), "xgboost.XGBClassifier")
    assert(rec.isEmpty)
  }

  // ----------------------------------------------------- KGpip integration
  test("Pip_LiDS warm start reaches a no-worse config under the same budget") {
    val d  = MlDatasets.cleaningBenchmark(4) // credit: mcar, moderate noise
    val df = CleaningOps.simpleImputer(d.generate(spark), d.featureCols).cache()
    val estimatorOf = datasets.map(x => s"${x.name}/data" -> "RandomForestClassifier").toMap
    val kgpip = new KgpipLike(trained.tableIndex, estimatorOf)
    val budget = 4
    val (coldScore, _) = kgpip.searchHyperparams(
      df, d.labelCol, d.featureCols, warmStart = None, budgetConfigs = budget)
    val (warmScore, _) = kgpip.searchHyperparams(
      df, d.labelCol, d.featureCols, warmStart = Some((100, 8)), budgetConfigs = budget)
    df.unpersist()
    assert(warmScore >= coldScore - 2.0,
      s"warm $warmScore should not lose to cold $coldScore under equal budget")
  }
  test("KGpip selects an estimator via embedding similarity") {
    val estimatorOf = datasets.map(x => s"${x.name}/data" -> "RandomForestClassifier").toMap
    val kgpip = new KgpipLike(trained.tableIndex, estimatorOf)
    val (tid, ps) = trained.profilesByTable.head
    val sel = kgpip.selectEstimator(TableEmbedding.fromProfiles(ps))
    assert(sel.contains("RandomForestClassifier"))
  }
}
