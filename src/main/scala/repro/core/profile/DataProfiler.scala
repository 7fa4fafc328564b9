package repro.core.profile

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.functions._

import repro.core.embed.ColrModel
import repro.substrate.text.WordEmbedding

/** Scalable data profiling (Alg. 2), expressed as a DataFrame program.
  *
  * A data lake is represented as one *cells* DataFrame with schema
  * `(dataset, table, column, row, value)` — the column is the unit of
  * parallelism, exactly as in the paper's PySpark profiler: the cells
  * are grouped per column, a deterministic ~`samplePct`% value sample
  * (never fewer than `minSample` rows) is collected, and each group is
  * profiled independently on executors (type inference → statistics →
  * CoLR + label embeddings).
  */
object DataProfiler {

  /** One cell of a lake table; `row` is the row ordinal inside the table. */
  case class Cell(dataset: String, table: String, column: String, row: Long, value: String)

  /** Per-column aggregation row (public: Catalyst codegen instantiates it). */
  case class Grouped(
      dataset: String, table: String, column: String,
      total: Long, nonNull: Long, distinct: Long, sample: Seq[String])

  /** Turn a regular DataFrame into profiler cells. Every column is cast
    * to string; `row` is a per-table ordinal used for deterministic
    * sampling.
    */
  def cellsOf(spark: SparkSession, datasetName: String, tableName: String,
              df: DataFrame): DataFrame = {
    val withRow = df.withColumn("__row", monotonically_increasing_id())
    val stacked = df.columns.map { c =>
      struct(lit(c).as("column"), col(s"`$c`").cast("string").as("value"))
    }
    withRow
      .select(col("__row").as("row"), explode(array(stacked.toIndexedSeq: _*)).as("cell"))
      .select(
        lit(datasetName).as("dataset"),
        lit(tableName).as("table"),
        col("cell.column").as("column"),
        col("row"),
        col("cell.value").as("value"),
      )
  }

  /** Profile a cells DataFrame into one [[ColumnProfile]] per column.
    *
    * @param samplePct  percentage of rows sampled per column (paper: 10)
    * @param minSample  minimum sample size (paper: 1000)
    */
  def profileCells(spark: SparkSession, cells: DataFrame,
                   samplePct: Int = 10, minSample: Int = 1000): Dataset[ColumnProfile] = {
    import spark.implicits._
    // Deterministic sample gate: hash of (table, column, row) — stable
    // across runs so the DuckDB oracle sees identical profiles.
    val inSample =
      (pmod(xxhash64(col("table"), col("column"), col("row")), lit(100L)) < lit(samplePct.toLong)) ||
        (col("row") < lit(minSample.toLong))

    cells
      .groupBy("dataset", "table", "column")
      .agg(
        count(lit(1)).as("total"),
        count(col("value")).as("nonNull"),
        approx_count_distinct(col("value")).as("distinct"),
        collect_list(when(inSample, col("value"))).as("sample"),
      )
      .as[Grouped]
      .map(profileGroup)
  }

  /** Profile one grouped column — runs on executors. */
  private def profileGroup(g: Grouped): ColumnProfile = {
    val sample = g.sample.filter(_ != null)
    val fgt    = TypeInference.infer(sample)
    val (mean, std, mn, mx) =
      if (FineGrainedType.isNumeric(fgt)) ColumnStats.numericStats(sample)
      else (0.0, 0.0, 0.0, 0.0)
    ColumnProfile(
      datasetName = g.dataset,
      tableName = g.table,
      columnName = g.column,
      fgType = fgt,
      totalCount = g.total,
      nonNullCount = g.nonNull,
      distinctCount = g.distinct,
      trueRatio = if (fgt == FineGrainedType.Boolean) ColumnStats.trueRatio(sample) else 0.0,
      mean = mean, std = std, minVal = mn, maxVal = mx,
      embedding = ColrModel.embed(fgt, sample),
      labelEmbedding = WordEmbedding.labelEmbedding(g.column),
    )
  }

  /** Convenience: profile a single in-memory DataFrame (the automation
    * inference path — "the GNN model takes the unseen dataset in the
    * form of a DataFrame and calculates the CoLR embedding per column").
    */
  def profileTable(spark: SparkSession, datasetName: String, tableName: String,
                   df: DataFrame): Seq[ColumnProfile] =
    profileCells(spark, cellsOf(spark, datasetName, tableName, df))
      .collect().toSeq.sortBy(_.columnName)
}
