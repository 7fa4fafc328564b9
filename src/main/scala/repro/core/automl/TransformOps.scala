package repro.core.automl

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** The transformation operations the transformation GNNs choose among
  * (§4.3): table-level scalers (StandardScaler, MinMaxScaler,
  * RobustScaler) applied to all numeric features, and unary per-column
  * transformations (log, sqrt). Scaling is recommended before unary
  * transforms, per the paper.
  */
object TransformOps {

  val StandardScaler = "StandardScaler"
  val MinMaxScaler   = "MinMaxScaler"
  val RobustScaler   = "RobustScaler"
  val NoScaler       = "NoScaler"

  /** Scaler class order of the table-transformation GNN. */
  val Scalers: Seq[String] = Seq(StandardScaler, MinMaxScaler, RobustScaler, NoScaler)

  val Log  = "log"
  val Sqrt = "sqrt"
  val None = "none"

  /** Unary class order of the column-transformation GNN. */
  val Unaries: Seq[String] = Seq(Log, Sqrt, None)

  /** Apply a named scaler to all given numeric columns. */
  def scale(df: DataFrame, cols: Seq[String], scaler: String): DataFrame = scaler match {
    case NoScaler => df
    case StandardScaler =>
      val stats = df.select(cols.flatMap(c =>
        Seq(avg(col(c)).as(s"m_$c"), stddev_pop(col(c)).as(s"s_$c"))): _*).collect()(0)
      cols.zipWithIndex.foldLeft(df) { case (d, (c, i)) =>
        val m = if (stats.isNullAt(2 * i)) 0.0 else stats.getDouble(2 * i)
        val s0 = if (stats.isNullAt(2 * i + 1)) 0.0 else stats.getDouble(2 * i + 1)
        val s = if (s0 == 0.0) 1.0 else s0
        d.withColumn(c, (col(c) - lit(m)) / lit(s))
      }
    case MinMaxScaler =>
      val stats = df.select(cols.flatMap(c =>
        Seq(min(col(c)).as(s"lo_$c"), max(col(c)).as(s"hi_$c"))): _*).collect()(0)
      cols.zipWithIndex.foldLeft(df) { case (d, (c, i)) =>
        val lo = if (stats.isNullAt(2 * i)) 0.0 else stats.getDouble(2 * i)
        val hi = if (stats.isNullAt(2 * i + 1)) 0.0 else stats.getDouble(2 * i + 1)
        val range = if (hi - lo == 0.0) 1.0 else hi - lo
        d.withColumn(c, (col(c) - lit(lo)) / lit(range))
      }
    case RobustScaler =>
      val qs = df.stat.approxQuantile(cols.toArray, Array(0.25, 0.5, 0.75), 0.01)
      cols.zipWithIndex.foldLeft(df) { case (d, (c, i)) =>
        val Array(q1, med, q3) = qs(i)
        val iqr = if (q3 - q1 == 0.0) 1.0 else q3 - q1
        d.withColumn(c, (col(c) - lit(med)) / lit(iqr))
      }
    case other => throw new IllegalArgumentException(s"unknown scaler $other")
  }

  /** Apply a unary transform to one column. `log`/`sqrt` are shifted to
    * tolerate non-positive values (sklearn pipelines do the same with
    * `log1p` after clipping).
    */
  def unary(df: DataFrame, c: String, op: String): DataFrame = op match {
    case None => df
    case Log =>
      val lo = df.select(min(col(c))).collect()(0) match {
        case r if r.isNullAt(0) => 0.0
        case r                  => r.getDouble(0)
      }
      val shift = if (lo < 0.0) -lo else 0.0
      df.withColumn(c, log1p(col(c) + lit(shift)))
    case Sqrt =>
      val lo = df.select(min(col(c))).collect()(0) match {
        case r if r.isNullAt(0) => 0.0
        case r                  => r.getDouble(0)
      }
      val shift = if (lo < 0.0) -lo else 0.0
      df.withColumn(c, sqrt(col(c) + lit(shift)))
    case other => throw new IllegalArgumentException(s"unknown unary transform $other")
  }
}
