package repro.substrate.rdf

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.functions._

/** DataFrame-backed RDF-star triple store — the GraphDB stand-in.
  *
  * Triples live in one DataFrame `(graph, subject, predicate, obj,
  * weight)`, hash-partitioned by predicate (the access path SPARQL
  * engines index first) and cached. Queries go through [[BgpEngine]],
  * which compiles a basic graph pattern to a chain of DataFrame joins.
  */
final class TripleStore private (val spark: SparkSession, val df: DataFrame) {

  /** Number of triples (edges). */
  def size: Long = df.count()

  /** Number of distinct nodes (subjects ∪ objects of IRI-ish edges). */
  def nodeCount: Long =
    df.select(col("subject").as("n"))
      .union(df.select(col("obj").as("n")))
      .distinct()
      .count()

  /** Number of distinct predicates (edge types). */
  def predicateCount: Long = df.select("predicate").distinct().count()

  /** Triple count per predicate — the Table 4 breakdown primitive. */
  def countByPredicate(): Map[String, Long] =
    df.groupBy("predicate").count().collect()
      .map(r => r.getString(0) -> r.getLong(1)).toMap

  /** A new store containing this store's triples plus `more`. */
  def union(more: TripleStore): TripleStore =
    new TripleStore(spark, df.unionByName(more.df))

  /** Evaluate a BGP; the result has one column per variable. */
  def select(patterns: Seq[TriplePattern]): DataFrame =
    BgpEngine.query(df, patterns)

  /** Rough serialized size in bytes (N-Triples-style line lengths),
    * used for the Table 3 "Size" row.
    */
  def approxSerializedBytes: Long =
    df.select(
      sum(length(col("graph")) + length(col("subject")) +
        length(col("predicate")) + length(col("obj")) + lit(16L)).as("b"))
      .collect()(0).getLong(0)

  def cache(): TripleStore = { df.cache(); this }
  def unpersist(): Unit = df.unpersist()
}

object TripleStore {

  /** Build a store from local triples (driver-side corpus). */
  def apply(spark: SparkSession, triples: Seq[Triple]): TripleStore = {
    import spark.implicits._
    fromDataset(triples.toDS())
  }

  /** Build a store from a distributed Dataset of triples. */
  def fromDataset(triples: Dataset[Triple]): TripleStore = {
    val spark = triples.sparkSession
    val df = triples.toDF()
      .repartition(math.max(1, triples.sparkSession.sparkContext.defaultParallelism),
                   col("predicate"))
    new TripleStore(spark, df)
  }

  /** Build a store from a DataFrame already in triple layout. */
  def fromDF(spark: SparkSession, df: DataFrame): TripleStore = {
    val cols = Seq("graph", "subject", "predicate", "obj", "weight")
    require(cols.forall(df.columns.contains),
      s"triple DataFrame must have columns $cols, got ${df.columns.toSeq}")
    new TripleStore(spark, df.select(cols.map(col): _*))
  }
}
