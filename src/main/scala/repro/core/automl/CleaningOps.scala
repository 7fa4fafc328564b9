package repro.core.automl

import org.apache.spark.sql.{Column, DataFrame, Row}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** The 5 cleaning operations the cleaning GNN chooses among (§4.2):
  * Fillna, Interpolate, SimpleImputer, KNNImputer, IterativeImputer —
  * each implemented as a DataFrame → DataFrame transformation over the
  * given feature columns (numeric doubles; string columns are
  * mode/constant-filled where the op defines it).
  */
object CleaningOps {

  val Fillna           = "Fillna"
  val Interpolate      = "Interpolate"
  val SimpleImputer    = "SimpleImputer"
  val KnnImputer       = "KNNImputer"
  val IterativeImputer = "IterativeImputer"

  /** All operations, in the GNN's class order. */
  val All: Seq[String] =
    Seq(Fillna, Interpolate, SimpleImputer, KnnImputer, IterativeImputer)

  /** Apply a named cleaning operation. */
  def apply(op: String, df: DataFrame, featureCols: Seq[String]): DataFrame = op match {
    case Fillna           => fillna(df, featureCols)
    case Interpolate      => interpolate(df, featureCols)
    case SimpleImputer    => simpleImputer(df, featureCols)
    case KnnImputer       => knnImputer(df, featureCols)
    case IterativeImputer => iterativeImputer(df, featureCols)
    case other            => throw new IllegalArgumentException(s"unknown cleaning op $other")
  }

  private def split(df: DataFrame, cols: Seq[String]): (Seq[String], Seq[String]) =
    cols.partition { c =>
      df.schema(c).dataType.typeName match {
        case "double" | "float" | "integer" | "long" | "short" => true
        case _                                                 => false
      }
    }

  /** `df.fillna(0)` / `'missing'` — the pandas constant-fill idiom. */
  def fillna(df: DataFrame, cols: Seq[String]): DataFrame = {
    val (num, str) = split(df, cols)
    df.na.fill(0.0, num).na.fill("missing", str)
  }

  /** sklearn SimpleImputer: mean for numeric, most-frequent for strings. */
  def simpleImputer(df: DataFrame, cols: Seq[String]): DataFrame = {
    val (num, str) = split(df, cols)
    val means = if (num.isEmpty) Row() else
      df.select(num.map(c => avg(col(c)).as(c)): _*).collect()(0)
    val meanMap = num.zipWithIndex.map { case (c, i) =>
      c -> (if (means.isNullAt(i)) 0.0 else means.getDouble(i))
    }.toMap
    val modes = str.map { c =>
      val top = df.groupBy(c).count()
        .filter(col(c).isNotNull)
        .orderBy(desc("count"), col(c))
        .limit(1).collect()
      c -> top.headOption.map(_.get(0).toString).getOrElse("missing")
    }.toMap
    df.na.fill(meanMap).na.fill(modes)
  }

  /** pandas `interpolate(method='linear')`: a missing cell becomes the
    * average of the nearest non-null values before and after it in row
    * order (one-sided at the edges, column mean when fully isolated).
    */
  def interpolate(df: DataFrame, cols: Seq[String]): DataFrame = {
    val (num, str) = split(df, cols)
    val withId = df.withColumn("__rid", monotonically_increasing_id())
    val before = Window.orderBy("__rid").rowsBetween(Window.unboundedPreceding, -1)
    val after  = Window.orderBy("__rid").rowsBetween(1, Window.unboundedFollowing)
    val out = num.foldLeft(withId) { (d, c) =>
      val prev = last(col(c), ignoreNulls = true).over(before)
      val next = first(col(c), ignoreNulls = true).over(after)
      val fillVal = when(prev.isNotNull && next.isNotNull, (prev + next) / 2.0)
        .when(prev.isNotNull, prev)
        .otherwise(next)
      d.withColumn(c, coalesce(col(c), fillVal))
    }
    // residual nulls (empty column) + strings → mean/mode via SimpleImputer
    simpleImputer(out.drop("__rid"), (num ++ str))
  }

  /** sklearn KNNImputer (k=5) against a broadcast anchor sample of
    * complete rows: a missing cell is the mean of that column over the k
    * anchors nearest in standardized euclidean distance on the row's
    * observed features.
    */
  def knnImputer(df: DataFrame, cols: Seq[String], k: Int = 5,
                 maxAnchors: Int = 128): DataFrame = {
    val (num, str) = split(df, cols)
    if (num.isEmpty) return simpleImputer(df, cols)

    val stats = df.select(num.flatMap(c =>
      Seq(avg(col(c)).as(s"m_$c"), stddev_pop(col(c)).as(s"s_$c"))): _*).collect()(0)
    val mean = num.indices.map(i => if (stats.isNullAt(2 * i)) 0.0 else stats.getDouble(2 * i)).toArray
    val std  = num.indices.map { i =>
      val s = if (stats.isNullAt(2 * i + 1)) 0.0 else stats.getDouble(2 * i + 1)
      if (s == 0.0) 1.0 else s
    }.toArray

    val anchors: Array[Array[Double]] = df
      .na.drop(num)
      .limit(maxAnchors)
      .select(num.map(c => col(c).cast("double")): _*)
      .collect()
      .map(r => num.indices.map(r.getDouble).toArray)

    if (anchors.isEmpty) return simpleImputer(df, cols)

    val fillUdf = udf { (values: Seq[java.lang.Double], target: Int) =>
      val obs = values.toArray
      val dists = anchors.map { a =>
        var s = 0.0; var cnt = 0; var i = 0
        while (i < a.length) {
          if (i != target && obs(i) != null) {
            val d = (obs(i) - a(i)) / std(i); s += d * d; cnt += 1
          }
          i += 1
        }
        if (cnt == 0) Double.MaxValue else math.sqrt(s / cnt)
      }
      val nearest = dists.zipWithIndex.sortBy(_._1).take(k).map(_._2)
      if (nearest.isEmpty) mean(target)
      else nearest.map(i => anchors(i)(target)).sum / nearest.size
    }

    val featArray = array(num.map(c => col(c).cast("double")): _*)
    val out = num.zipWithIndex.foldLeft(df) { case (d, (c, i)) =>
      d.withColumn(c, coalesce(col(c), fillUdf(featArray, lit(i))))
    }
    simpleImputer(out, str) // strings still need a fill
  }

  /** sklearn IterativeImputer (round-robin regression): each null column
    * is modelled as a ridge regression on the other (mean-filled)
    * columns, fit on a driver-side sample and applied as a Catalyst
    * linear-combination expression; repeated for `iterations` rounds.
    */
  def iterativeImputer(df: DataFrame, cols: Seq[String], iterations: Int = 2,
                       maxFitRows: Int = 20000, ridge: Double = 1e-3): DataFrame = {
    val (num, str) = split(df, cols)
    if (num.size < 2) return simpleImputer(df, cols)

    val means = df.select(num.map(c => avg(col(c)).as(c)): _*).collect()(0)
    val meanOf = num.zipWithIndex.map { case (c, i) =>
      c -> (if (means.isNullAt(i)) 0.0 else means.getDouble(i))
    }.toMap

    val nullCols = num.filter(c => df.filter(col(c).isNull).limit(1).count() > 0)
    if (nullCols.isEmpty) return simpleImputer(df, cols)

    var current = df
    (0 until iterations).foreach { _ =>
      nullCols.foreach { target =>
        val others = num.filterNot(_ == target)
        // fit on rows where the target is observed, others mean-filled
        val fitRows = current.filter(col(target).isNotNull)
          .select((others :+ target).map(c =>
            coalesce(col(c).cast("double"), lit(meanOf(c))).as(c)): _*)
          .limit(maxFitRows).collect()
        if (fitRows.length >= others.size + 2) {
          val d = others.size
          val xtx = Array.ofDim[Double](d + 1, d + 1)
          val xty = Array.ofDim[Double](d + 1)
          fitRows.foreach { r =>
            val x = Array(1.0) ++ (0 until d).map(r.getDouble)
            val y = r.getDouble(d)
            var i = 0
            while (i < d + 1) {
              var j = 0
              while (j < d + 1) { xtx(i)(j) += x(i) * x(j); j += 1 }
              xty(i) += x(i) * y
              i += 1
            }
          }
          (0 to d).foreach(i => xtx(i)(i) += ridge * fitRows.length)
          solveInPlace(xtx, xty).foreach { coef =>
            val pred: Column = others.zipWithIndex
              .map { case (c, i) =>
                coalesce(col(c).cast("double"), lit(meanOf(c))) * lit(coef(i + 1))
              }
              .foldLeft(lit(coef(0)): Column)(_ + _)
            current = current.withColumn(target, coalesce(col(target), pred))
          }
        }
      }
    }
    simpleImputer(current, num ++ str) // mop up anything unfit
  }

  /** Gaussian elimination with partial pivoting; None when singular. */
  private[automl] def solveInPlace(a: Array[Array[Double]],
                                   b: Array[Double]): Option[Array[Double]] = {
    val n = b.length
    val m = a.map(_.clone())
    val y = b.clone()
    var i = 0
    while (i < n) {
      var p = i
      var r = i + 1
      while (r < n) { if (math.abs(m(r)(i)) > math.abs(m(p)(i))) p = r; r += 1 }
      if (math.abs(m(p)(i)) < 1e-12) return None
      val tm = m(i); m(i) = m(p); m(p) = tm
      val ty = y(i); y(i) = y(p); y(p) = ty
      r = i + 1
      while (r < n) {
        val f = m(r)(i) / m(i)(i)
        var cIdx = i
        while (cIdx < n) { m(r)(cIdx) -= f * m(i)(cIdx); cIdx += 1 }
        y(r) -= f * y(i)
        r += 1
      }
      i += 1
    }
    val x = Array.ofDim[Double](n)
    i = n - 1
    while (i >= 0) {
      var s = y(i)
      var j = i + 1
      while (j < n) { s -= m(i)(j) * x(j); j += 1 }
      x(i) = s / m(i)(i)
      i -= 1
    }
    Some(x)
  }
}
