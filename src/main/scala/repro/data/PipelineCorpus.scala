package repro.data

import scala.util.Random

import repro.core.automl.{CleaningOps, TransformOps}
import repro.core.pipeline.ScriptRecord

/** Synthetic Kaggle-style pipeline scripts — the 13.8k-pipeline corpus
  * stand-in (DESIGN.md §3).
  *
  * Every script follows the shape of the paper's Fig. 3 (read_csv →
  * feature/label split → cleaning → scaling → unary transforms →
  * train/test split → estimator with hyperparameters → metric), plus
  * noise statements (prints, head(), loops, conditionals, user
  * functions) that exercise the abstraction's control-flow handling and
  * insignificant-statement filtering. Ground truth (which ops each
  * pipeline used) is known by construction, and pipelines over a
  * dataset mostly use its family's best operation — the "accumulated
  * data-scientist knowledge" the GNN models learn from.
  */
object PipelineCorpus {

  /** What a script references in its dataset. */
  case class DatasetRef(name: String, label: String, features: Seq[String],
                        bestCleaning: String, bestScaler: String, logCols: Seq[String])

  def refOf(d: MlDataset): DatasetRef =
    DatasetRef(d.name, d.labelCol, d.featureCols, d.bestCleaning, d.bestScaler, d.logCols)

  /** The family-typical estimator a dataset's community uses (keyed by
    * dataset-name hash): (class, module, grid of plausible hp values —
    * head value is the typical one).
    */
  def estimatorFor(datasetName: String): (String, String, Seq[(String, Seq[String])]) =
    estimators(math.abs(datasetName.hashCode) % estimators.size)

  private val estimators = Vector(
    ("RandomForestClassifier", "sklearn.ensemble",
     Seq("n_estimators" -> Seq("50", "100", "200"), "max_depth" -> Seq("5", "8", "10"))),
    ("GradientBoostingClassifier", "sklearn.ensemble",
     Seq("n_estimators" -> Seq("100", "150"), "learning_rate" -> Seq("0.05", "0.1"))),
    ("LogisticRegression", "sklearn.linear_model",
     Seq("C" -> Seq("0.5", "1.0", "2.0"), "max_iter" -> Seq("200", "500"))),
    ("XGBClassifier", "xgboost",
     Seq("n_estimators" -> Seq("100", "300"), "max_depth" -> Seq("4", "6"))),
  )

  private def cleaningLines(op: String, rng: Random): Seq[String] = op match {
    case CleaningOps.Fillna      => Seq("X = X.fillna(0)")
    case CleaningOps.Interpolate => Seq("X = X.interpolate('linear')")
    case CleaningOps.SimpleImputer =>
      val strategy = if (rng.nextBoolean()) "'mean'" else "'most_frequent'"
      Seq(s"imputer = SimpleImputer(strategy=$strategy)", "X = imputer.fit_transform(X)")
    case CleaningOps.KnnImputer =>
      Seq("imputer = KNNImputer(n_neighbors=5)", "X = imputer.fit_transform(X)")
    case CleaningOps.IterativeImputer =>
      Seq("imputer = IterativeImputer(max_iter=10)", "X = imputer.fit_transform(X)")
    case _ => Seq.empty
  }

  private def scalerLines(scaler: String): Seq[String] = scaler match {
    case TransformOps.NoScaler => Seq.empty
    case s => Seq(s"scaler = $s()", "X = scaler.fit_transform(X)")
  }

  /** Render one pipeline script. */
  def script(ref: DatasetRef, cleaning: String, scaler: String,
             unaryOps: Seq[(String, String)], // (column, log|sqrt)
             estimator: (String, String, Seq[(String, String)]), // (cls, module, hp)
             rng: Random): String = {
    val (cls, module, hp) = estimator
    val imports = Seq(
      "import pandas as pd",
      "import numpy as np",
      "from sklearn.impute import SimpleImputer, KNNImputer, IterativeImputer",
      "from sklearn.preprocessing import StandardScaler, MinMaxScaler, RobustScaler",
      "from sklearn.model_selection import train_test_split",
      s"from $module import $cls",
      "from sklearn.metrics import accuracy_score, f1_score",
    )
    val hpStr = hp.map { case (k, v) => s"$k=$v" }.mkString(", ")

    // EDA noise: real Kaggle pipelines are dominated by exploratory
    // statements KGLiDS discards as insignificant but general-purpose
    // abstraction (G4C) models in full
    val edaPool = Seq(
      "print(df.head())", "print(df.describe())", "df.head()",
      "df.describe()", "plt.plot(df['" + ref.features.head + "'])",
      "plt.show()", "print(df.head(10))",
      "sns.heatmap(df.corr())", "plt.show()",
      "print(df.describe())",
    )
    val noiseEda = Seq("import matplotlib.pyplot as plt", "import seaborn as sns") ++
      (0 until 3 + rng.nextInt(4)).map(_ => edaPool(rng.nextInt(edaPool.size)))
    val noiseLoop =
      if (rng.nextBoolean() && ref.features.size >= 2) {
        val cs = rng.shuffle(ref.features.toVector).take(2)
        Seq(s"for c in ['${cs(0)}', '${cs(1)}']:", "    X[c] = X[c] * 1")
      } else Seq.empty
    val noiseCond =
      if (rng.nextBoolean())
        Seq("if True:", "    seed = 42")
      else Seq.empty
    val noiseFunc =
      if (rng.nextInt(4) == 0)
        Seq("def evaluate(m):",
            "    return accuracy_score(y_test, m.predict(X_test))")
      else Seq.empty

    val body = Seq(
      s"df = pd.read_csv('${ref.name}/data.csv')",
    ) ++ noiseEda ++ Seq(
      s"X, y = df.drop('${ref.label}', axis=1), df['${ref.label}']",
    ) ++ cleaningLines(cleaning, rng) ++ scalerLines(scaler) ++
      unaryOps.map { case (c, op) =>
        val fn = if (op == TransformOps.Log) "log" else "sqrt"
        s"X['$c'] = np.$fn(X['$c'])"
      } ++ noiseLoop ++ noiseCond ++ Seq(
      "X_train, X_test, y_train, y_test = train_test_split(X, y, 0.2)",
      s"clf = $cls($hpStr)",
      "clf.fit(X_train, y_train)",
    ) ++ noiseFunc ++ Seq(
      "print(f1_score(y_test, clf.predict(X_test)))",
    )
    (imports ++ body).mkString("\n")
  }

  /** Pipelines for a set of datasets: `per` scripts per dataset, ~80%
    * of which use the dataset family's best ops (community consensus),
    * the rest a random alternative.
    */
  def forDatasets(refs: Seq[DatasetRef], per: Int, seed: Long): Seq[ScriptRecord] = {
    val rng = new Random(seed)
    refs.flatMap { ref =>
      (0 until per).map { i =>
        val cleaning =
          if (rng.nextDouble() < 0.8) ref.bestCleaning
          else CleaningOps.All(rng.nextInt(CleaningOps.All.size))
        val scaler =
          if (rng.nextDouble() < 0.8) ref.bestScaler
          else TransformOps.Scalers(rng.nextInt(TransformOps.Scalers.size))
        val unary = ref.logCols.filter(_ => rng.nextDouble() < 0.9)
          .map(c => c -> TransformOps.Log) ++
          (if (ref.logCols.isEmpty && rng.nextInt(5) == 0)
             Seq(ref.features.last -> TransformOps.Sqrt)
           else Seq.empty)
        // family-typical estimator/hyperparams: keyed by dataset name hash
        val est     = estimatorFor(ref.name)
        val hpTypical = est._3.map { case (k, vs) => k -> vs.head }
        val hp =
          if (rng.nextDouble() < 0.7) hpTypical
          else est._3.map { case (k, vs) => k -> vs(rng.nextInt(vs.size)) }
        ScriptRecord(
          id = s"pipeline/${ref.name}/$i",
          dataset = ref.name,
          author = s"user_${rng.nextInt(200)}",
          votes = rng.nextInt(500),
          score = 0.5 + rng.nextDouble() * 0.49,
          script = script(ref, cleaning, scaler, unary, (est._1, est._2, hp), rng),
        )
      }
    }
  }

  /** The Table 3/4 abstraction corpus: `n` scripts over a pool of
    * dataset refs (graph size/time comparison only — no linking needed).
    */
  def abstractionCorpus(n: Int, seed: Long): Seq[ScriptRecord] = {
    val pool = (MlDatasets.cleaningTrainingCorpus() ++ MlDatasets.transformTrainingCorpus())
      .map(refOf)
    val per = math.max(1, math.ceil(n.toDouble / pool.size).toInt)
    forDatasets(pool, per, seed).take(n)
  }
}
