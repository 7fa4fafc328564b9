package repro.core.pipeline

/** Library documentation database `LD` of Alg. 1.
  *
  * One entry per documented class/method of the data-science libraries
  * the corpus uses (pandas, sklearn, xgboost, numpy). Each entry carries
  * the return type, the ordered parameter names (so implicit positional
  * arguments get their names back), and default parameter values (so
  * unspecified hyperparameters appear in the graph too) — the paper's
  * documentation analysis in a lookup table.
  */
object DocDb {

  /** Documentation record for one callable. */
  case class DocEntry(
      qualifiedName: String,
      returnType: Option[String],
      paramNames: Seq[String],
      defaults: Map[String, String],
  )

  private def e(qn: String, ret: String, params: Seq[String],
                defaults: (String, String)*): DocEntry =
    DocEntry(qn, Option(ret).filter(_.nonEmpty), params, defaults.toMap)

  private def e(qn: String, ret: String): DocEntry =
    e(qn, ret, Seq.empty)

  val DF = "pandas.DataFrame"

  /** All documented callables, keyed by qualified name. */
  val entries: Map[String, DocEntry] = Seq(
    // ---------------------------------------------------------- pandas
    e("pandas.read_csv", DF, Seq("filepath_or_buffer", "sep", "header"),
      "sep" -> "','", "header" -> "'infer'"),
    e(s"$DF.drop", DF, Seq("labels", "axis"), "axis" -> "0"),
    e(s"$DF.fillna", DF, Seq("value", "method"), "method" -> "None"),
    e(s"$DF.interpolate", DF, Seq("method"), "method" -> "'linear'"),
    e(s"$DF.dropna", DF, Seq("axis", "how"), "axis" -> "0", "how" -> "'any'"),
    e(s"$DF.head", DF, Seq("n"), "n" -> "5"),
    e(s"$DF.describe", DF),
    e(s"$DF.groupby", "pandas.GroupBy", Seq("by")),
    e(s"$DF.merge", DF, Seq("right", "on", "how"), "how" -> "'inner'"),
    e(s"$DF.corr", DF, Seq("method"), "method" -> "'pearson'"),
    e(s"$DF.copy", DF),
    e(s"$DF.apply", DF, Seq("func", "axis"), "axis" -> "0"),
    // --------------------------------------------------------- sklearn
    e("sklearn.impute.SimpleImputer", "sklearn.impute.SimpleImputer",
      Seq("missing_values", "strategy"), "strategy" -> "'mean'"),
    e("sklearn.impute.SimpleImputer.fit_transform", "numpy.ndarray", Seq("X", "y")),
    e("sklearn.impute.KNNImputer", "sklearn.impute.KNNImputer",
      Seq("missing_values", "n_neighbors"), "n_neighbors" -> "5"),
    e("sklearn.impute.KNNImputer.fit_transform", "numpy.ndarray", Seq("X", "y")),
    e("sklearn.impute.IterativeImputer", "sklearn.impute.IterativeImputer",
      Seq("estimator", "max_iter"), "max_iter" -> "10"),
    e("sklearn.impute.IterativeImputer.fit_transform", "numpy.ndarray", Seq("X", "y")),
    e("sklearn.preprocessing.StandardScaler", "sklearn.preprocessing.StandardScaler",
      Seq("copy", "with_mean", "with_std"), "with_mean" -> "True", "with_std" -> "True"),
    e("sklearn.preprocessing.StandardScaler.fit_transform", "numpy.ndarray", Seq("X", "y")),
    e("sklearn.preprocessing.MinMaxScaler", "sklearn.preprocessing.MinMaxScaler",
      Seq("feature_range"), "feature_range" -> "(0, 1)"),
    e("sklearn.preprocessing.MinMaxScaler.fit_transform", "numpy.ndarray", Seq("X", "y")),
    e("sklearn.preprocessing.RobustScaler", "sklearn.preprocessing.RobustScaler",
      Seq("with_centering", "with_scaling"),
      "with_centering" -> "True", "with_scaling" -> "True"),
    e("sklearn.preprocessing.RobustScaler.fit_transform", "numpy.ndarray", Seq("X", "y")),
    e("sklearn.preprocessing.LabelEncoder", "sklearn.preprocessing.LabelEncoder"),
    e("sklearn.preprocessing.LabelEncoder.fit_transform", "numpy.ndarray", Seq("y")),
    e("sklearn.preprocessing.OneHotEncoder", "sklearn.preprocessing.OneHotEncoder",
      Seq("categories"), "categories" -> "'auto'"),
    e("sklearn.model_selection.train_test_split", "tuple",
      Seq("X", "y", "test_size", "random_state"), "test_size" -> "0.25"),
    e("sklearn.ensemble.RandomForestClassifier", "sklearn.ensemble.RandomForestClassifier",
      Seq("n_estimators", "criterion", "max_depth", "min_samples_leaf"),
      "n_estimators" -> "100", "criterion" -> "'gini'",
      "max_depth" -> "None", "min_samples_leaf" -> "1"),
    e("sklearn.ensemble.RandomForestClassifier.fit", "sklearn.ensemble.RandomForestClassifier",
      Seq("X", "y")),
    e("sklearn.ensemble.RandomForestClassifier.predict", "numpy.ndarray", Seq("X")),
    e("sklearn.ensemble.GradientBoostingClassifier",
      "sklearn.ensemble.GradientBoostingClassifier",
      Seq("n_estimators", "learning_rate", "max_depth"),
      "n_estimators" -> "100", "learning_rate" -> "0.1", "max_depth" -> "3"),
    e("sklearn.ensemble.GradientBoostingClassifier.fit",
      "sklearn.ensemble.GradientBoostingClassifier", Seq("X", "y")),
    e("sklearn.ensemble.GradientBoostingClassifier.predict", "numpy.ndarray", Seq("X")),
    e("sklearn.linear_model.LogisticRegression", "sklearn.linear_model.LogisticRegression",
      Seq("C", "penalty", "max_iter"),
      "C" -> "1.0", "penalty" -> "'l2'", "max_iter" -> "100"),
    e("sklearn.linear_model.LogisticRegression.fit",
      "sklearn.linear_model.LogisticRegression", Seq("X", "y")),
    e("sklearn.linear_model.LogisticRegression.predict", "numpy.ndarray", Seq("X")),
    e("sklearn.svm.SVC", "sklearn.svm.SVC", Seq("C", "kernel", "gamma"),
      "C" -> "1.0", "kernel" -> "'rbf'", "gamma" -> "'scale'"),
    e("sklearn.svm.SVC.fit", "sklearn.svm.SVC", Seq("X", "y")),
    e("sklearn.svm.SVC.predict", "numpy.ndarray", Seq("X")),
    e("sklearn.metrics.accuracy_score", "float", Seq("y_true", "y_pred")),
    e("sklearn.metrics.f1_score", "float", Seq("y_true", "y_pred", "average"),
      "average" -> "'binary'"),
    // --------------------------------------------------------- xgboost
    e("xgboost.XGBClassifier", "xgboost.XGBClassifier",
      Seq("n_estimators", "learning_rate", "max_depth"),
      "n_estimators" -> "100", "learning_rate" -> "0.3", "max_depth" -> "6"),
    e("xgboost.XGBClassifier.fit", "xgboost.XGBClassifier", Seq("X", "y")),
    e("xgboost.XGBClassifier.predict", "numpy.ndarray", Seq("X")),
    // ----------------------------------------------------------- numpy
    e("numpy.log", "numpy.ndarray", Seq("x")),
    e("numpy.log1p", "numpy.ndarray", Seq("x")),
    e("numpy.sqrt", "numpy.ndarray", Seq("x")),
    e("numpy.abs", "numpy.ndarray", Seq("x")),
    // ------------------------------------------------------ matplotlib
    e("matplotlib.pyplot.plot", "", Seq("x", "y")),
    e("matplotlib.pyplot.show", ""),
    e("seaborn.heatmap", "", Seq("data")),
  ).map(d => d.qualifiedName -> d).toMap

  /** Lookup; also resolves `<Type>.method` through the type's entry. */
  def lookup(qualifiedName: String): Option[DocEntry] = entries.get(qualifiedName)

  /** Calls with no pipeline-semantic significance — discarded by the
    * abstraction (§3.1: print, head, summary, plotting).
    */
  val insignificantCalls: Set[String] = Set(
    "print", s"$DF.head", s"$DF.describe", s"$DF.info", s"$DF.summary",
    s"$DF.corr",
    "matplotlib.pyplot.plot", "matplotlib.pyplot.show", "matplotlib.pyplot.figure",
    "seaborn.heatmap",
  )

  /** Library-hierarchy triement: every dotted prefix chain of documented
    * callables, used to build the library graph.
    */
  def hierarchyPaths: Seq[Seq[String]] =
    entries.keys.toSeq.sorted.map(_.split('.').toSeq)
}
