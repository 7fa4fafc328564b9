package repro.data

import scala.util.Random

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** A synthetic ML benchmark dataset (UCI / AutoML-benchmark stand-in).
  *
  * Each dataset belongs to a *family* that fixes (i) the marginal shape
  * of its features — the signal CoLR embeddings cluster on — and (ii)
  * which preparation operation genuinely helps its task:
  *
  * cleaning families (§6.3.1):
  *  - `mcar`            uniform features, random missingness → mean fill is near-optimal
  *  - `smooth`          features smooth in row order → Interpolate reconstructs well
  *  - `correlated`      missing column is linear in the others, missing-at-random
  *                      conditioned on them → IterativeImputer reconstructs it
  *  - `cluster`         multimodal clusters → KNNImputer reconstructs from neighbours
  *  - `mostly_missing`  exponential features, nulls on every feature →
  *                      drop-nulls leaves almost nothing (paper's 00.00 rows)
  *
  * transformation families (§6.3.2):
  *  - `std`     gaussian features at wildly mixed scales → StandardScaler
  *  - `minmax`  bounded uniform features at mixed ranges → MinMaxScaler
  *  - `robust`  gaussian + heavy outliers → RobustScaler
  * any of them may add lognormal columns whose *log* drives the label
  * (the unary-transform targets).
  *
  * The label is an argmax of linear scores over the latent (ideally
  * transformed) feature representations plus noise, so undoing the
  * injected distortions genuinely improves the downstream model.
  */
case class MlDataset(
    id: Int,
    name: String,
    rows: Int,
    nFeatures: Int,
    nClasses: Int,
    family: String,
    bestCleaning: String,
    bestScaler: String,
    nLogCols: Int,
    missingFrac: Double,
    taskNoise: Double,
    seed: Long,
) {
  def featureCols: Seq[String] = (0 until nFeatures).map(i => s"f$i")
  def logCols: Seq[String]     = (0 until nLogCols).map(i => s"f$i") // by construction the first columns
  val labelCol                 = "label"

  /** Materialize the dataset (deterministic in the spec). */
  def generate(spark: SparkSession): DataFrame = {
    val rnd = new Random(seed)
    var df  = spark.range(rows).toDF("__id")

    // latent z_i (standardized representation the label depends on) and
    // observed feature f_i (the distorted version given to systems)
    val scaleOf = Array.fill(nFeatures)(math.pow(10.0, rnd.nextDouble() * 4 - 1))
    val shiftOf = Array.fill(nFeatures)(rnd.nextGaussian() * 10)

    (0 until nFeatures).foreach { i =>
      val s = seed * 1000 + i
      val isLog = i < nLogCols
      val (latent: Column, feature: Column) =
        if (isLog) {
          val g = randn(s)
          (g, exp(g * 1.2) * scaleOf(i)) // label needs log(f); f is lognormal
        } else family match {
          case "mcar" =>
            val u = rand(s)
            (u * 2 - 1, u * scaleOf(i) + shiftOf(i))
          case "smooth" =>
            val freq  = 1.0 + (i % 4)
            val phase = rnd.nextDouble() * 6.28
            val z = sin(col("__id") / lit(rows.toDouble) * lit(6.28 * freq) + lit(phase)) +
              randn(s) * 0.1
            (z, z * scaleOf(i) + shiftOf(i))
          case "correlated" =>
            val g = randn(s)
            (g, g * scaleOf(i) + shiftOf(i))
          case "cluster" =>
            val c = floor(rand(seed * 77) * nClasses) // shared cluster id
            val center = c * lit(3.0 * (if (i % 2 == 0) 1 else -1))
            val z = (center + randn(s) * 0.35) / 3.0
            (z, z * scaleOf(i) + shiftOf(i))
          case "mostly_missing" =>
            val e = -log(rand(s))
            (e - 1.0, e * scaleOf(i))
          case "std" =>
            val g = randn(s)
            (g, g * scaleOf(i) + shiftOf(i))
          case "minmax" =>
            val u = rand(s)
            (u * 2 - 1, u * scaleOf(i) + shiftOf(i))
          case "robust" =>
            val g      = randn(s)
            val outlie = when(rand(s + 7) < 0.05, randn(s + 9) * 25.0).otherwise(0.0)
            (g, (g + outlie) * scaleOf(i) + shiftOf(i))
          case other => throw new IllegalArgumentException(s"unknown family $other")
        }
      df = df.withColumn(s"z$i", latent).withColumn(s"f$i", feature)
    }

    // correlated family: feature 0 (or the first non-log feature) is a
    // linear function of the others so regression can reconstruct it
    val missTarget = nLogCols // first non-log feature index
    if (family == "correlated" && nFeatures >= missTarget + 3) {
      val reconstructed =
        col(s"z${missTarget + 1}") * 2.0 - col(s"z${missTarget + 2}") + randn(seed + 31) * 0.2
      df = df
        .withColumn(s"z$missTarget", reconstructed)
        .withColumn(s"f$missTarget",
          reconstructed * scaleOf(missTarget) + shiftOf(missTarget))
    }

    // transformation datasets: give the feature tail genuine pairwise
    // correlations (AutoLearn's distance-correlation phase needs real
    // dependences to find, as UCI data has)
    if (missingFrac == 0.0 && nFeatures >= 6) {
      val third = nFeatures / 3
      ((nFeatures - third) until nFeatures).foreach { i =>
        val src = i - third
        val z = col(s"z$src") * 0.8 + col(s"z${(src + 1) % third}") * 0.3 +
          randn(seed + 600 + i) * 0.15
        df = df.withColumn(s"z$i", z)
          .withColumn(s"f$i", z * scaleOf(i) + shiftOf(i))
      }
    }

    // label: argmax of linear scores over latents + noise
    val informative = math.min(nFeatures, 8)
    val scores: Seq[Column] = (0 until nClasses).map { k =>
      val w = Array.fill(informative)(rnd.nextGaussian())
      (0 until informative)
        .map(i => col(s"z$i") * w(i))
        .reduce(_ + _) + randn(seed + 999 + k) * taskNoise
    }
    df = df.withColumn("__scores", array(scores: _*))
      .withColumn(labelCol,
        concat(lit("c"), array_position(col("__scores"), array_max(col("__scores")))))

    // missing-value injection (cleaning families only)
    if (missingFrac > 0) {
      family match {
        case "correlated" =>
          // missing-at-random conditioned on an observed feature
          df = df.withColumn(s"f$missTarget",
            when(rand(seed + 500) < missingFrac * 2 && col(s"z${missTarget + 1}") > 0,
                 lit(null)).otherwise(col(s"f$missTarget")))
        case "mostly_missing" =>
          (0 until nFeatures).foreach { i =>
            df = df.withColumn(s"f$i",
              when(rand(seed + 500 + i) < missingFrac, lit(null)).otherwise(col(s"f$i")))
          }
        case _ =>
          // nulls in half the features
          (0 until nFeatures).filter(_ % 2 == 0).foreach { i =>
            df = df.withColumn(s"f$i",
              when(rand(seed + 500 + i) < missingFrac, lit(null)).otherwise(col(s"f$i")))
          }
      }
    }

    df.select((featureCols :+ labelCol).map(col): _*)
  }
}

/** The 13-dataset cleaning benchmark, the 17-dataset transformation
  * benchmark, and same-family training corpora for the GNN models.
  */
object MlDatasets {

  import repro.core.automl.{CleaningOps => C, TransformOps => T}

  private def cd(id: Int, name: String, rows: Int, d: Int, k: Int, family: String,
                 best: String, frac: Double, noise: Double): MlDataset =
    MlDataset(id, name, rows, d, k, family, best, T.NoScaler, 0, frac, noise, 1000L + id)

  /** Table 5's 13 datasets (names from the paper; sizes ascend). */
  val cleaningBenchmark: Seq[MlDataset] = Seq(
    cd(1, "hepatitis", 155, 8, 2, "mcar", C.SimpleImputer, 0.12, 1.2),
    cd(2, "horsecolic", 368, 10, 2, "mostly_missing", C.SimpleImputer, 0.55, 0.8),
    cd(3, "housevotes84", 435, 8, 2, "mcar", C.Fillna, 0.08, 0.15),
    cd(4, "breastcancerwisconsin", 699, 9, 2, "cluster", C.KnnImputer, 0.10, 0.2),
    cd(5, "credit", 690, 10, 2, "mcar", C.SimpleImputer, 0.10, 0.55),
    cd(6, "cleveland_heart_disease", 303, 10, 5, "mcar", C.SimpleImputer, 0.12, 3.0),
    cd(7, "titanic", 891, 8, 2, "smooth", C.Interpolate, 0.15, 0.7),
    cd(8, "creditg", 1000, 12, 2, "mostly_missing", C.SimpleImputer, 0.50, 1.1),
    cd(9, "jm1", 8000, 12, 2, "correlated", C.IterativeImputer, 0.15, 1.3),
    cd(10, "adult", 15000, 10, 2, "mcar", C.SimpleImputer, 0.10, 0.8),
    cd(11, "higgs", 30000, 14, 2, "correlated", C.IterativeImputer, 0.12, 1.0),
    cd(12, "APSFailure", 25000, 16, 2, "cluster", C.KnnImputer, 0.10, 0.35),
    cd(13, "albert", 20000, 12, 2, "mostly_missing", C.SimpleImputer, 0.55, 1.0),
  )

  private def td(id: Int, name: String, rows: Int, d: Int, k: Int, family: String,
                 scaler: String, nLog: Int, noise: Double): MlDataset =
    MlDataset(id, name, rows, d, k, family, C.SimpleImputer, scaler, nLog, 0.0, noise, 2000L + id)

  /** Table 6's 17 datasets (names from the paper; sizes ascend; the
    * paper's AutoLearn column times out from id 24 and OOMs on 30).
    */
  val transformBenchmark: Seq[MlDataset] = Seq(
    td(14, "fertility_Diagnosis", 100, 6, 2, "std", T.StandardScaler, 1, 0.7),
    td(15, "haberman", 306, 5, 2, "minmax", T.MinMaxScaler, 1, 1.1),
    td(16, "wine", 178, 8, 3, "std", T.StandardScaler, 0, 0.25),
    td(17, "Ecoli", 336, 7, 4, "minmax", T.MinMaxScaler, 1, 0.6),
    td(18, "pima_diabetes", 768, 8, 2, "robust", T.RobustScaler, 1, 1.0),
    td(19, "Bank_Note", 1372, 5, 2, "std", T.StandardScaler, 0, 0.1),
    td(20, "ionosphere", 351, 10, 2, "robust", T.RobustScaler, 1, 0.4),
    td(21, "sonar", 208, 12, 2, "std", T.StandardScaler, 1, 0.9),
    td(22, "Abalone", 4177, 8, 8, "minmax", T.MinMaxScaler, 1, 2.0),
    td(23, "libras", 360, 12, 8, "std", T.StandardScaler, 0, 0.6),
    td(24, "waveform", 5000, 12, 3, "std", T.StandardScaler, 1, 0.7),
    td(25, "letter_recognition", 12000, 14, 10, "minmax", T.MinMaxScaler, 0, 0.35),
    td(26, "opticaldigits", 5620, 14, 10, "std", T.StandardScaler, 0, 0.3),
    td(27, "featurepixel", 2000, 16, 10, "minmax", T.MinMaxScaler, 0, 0.3),
    td(28, "shuttle", 20000, 9, 5, "robust", T.RobustScaler, 1, 0.15),
    td(29, "featurefourier", 2000, 14, 10, "std", T.StandardScaler, 0, 0.75),
    td(30, "poker", 40000, 10, 6, "minmax", T.MinMaxScaler, 1, 1.6),
  )

  /** GNN training corpus: `perFamily` unseen-benchmark-disjoint datasets
    * per cleaning family (different seeds/sizes than the benchmark).
    */
  def cleaningTrainingCorpus(perFamily: Int = 4): Seq[MlDataset] = {
    val families = Seq(
      ("mcar", C.SimpleImputer), ("smooth", C.Interpolate),
      ("correlated", C.IterativeImputer), ("cluster", C.KnnImputer),
      ("mostly_missing", C.SimpleImputer),
    )
    families.zipWithIndex.flatMap { case ((fam, best), fi) =>
      (0 until perFamily).map { v =>
        cd(100 + fi * 10 + v, s"train_${fam}_$v", 600 + v * 300, 8 + v, 2, fam,
           best, if (fam == "mostly_missing") 0.5 else 0.12, 0.8)
          .copy(seed = 9000L + fi * 100 + v)
      }
    }
  }

  /** GNN training corpus for the transformation models. */
  def transformTrainingCorpus(perFamily: Int = 4): Seq[MlDataset] = {
    val families = Seq(
      ("std", T.StandardScaler), ("minmax", T.MinMaxScaler), ("robust", T.RobustScaler))
    families.zipWithIndex.flatMap { case ((fam, scaler), fi) =>
      (0 until perFamily).map { v =>
        td(200 + fi * 10 + v, s"ttrain_${fam}_$v", 500 + v * 250, 8 + v, 2, fam,
           scaler, if (v % 2 == 0) 1 else 0, 0.6)
          .copy(seed = 9500L + fi * 100 + v)
      }
    }
  }
}
