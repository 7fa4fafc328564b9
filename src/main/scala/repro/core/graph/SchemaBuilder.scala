package repro.core.graph

import org.apache.spark.sql.{Dataset, SparkSession}
import org.apache.spark.sql.functions._

import repro.core.embed.EmbeddingOps
import repro.core.profile.{ColumnProfile, FineGrainedType}
import repro.substrate.rdf.Triple

/** Data Global Schema builder — Alg. 3 as a DataFrame program.
  *
  * Phase 1 maps each column profile to its metadata subgraph (hierarchy
  * and statistics triples). Phase 2 forms all column pairs that share a
  * fine-grained type but live in different tables via a DataFrame
  * self-join (the paper's MapReduce-style pairwise distribution), and
  * emits weighted similarity edges:
  *
  *  - `LabelSimilarity` when label-embedding cosine ≥ α;
  *  - `ContentSimilarity` when CoLR cosine ≥ θ (non-boolean), or when
  *    1 − |trueRatio_i − trueRatio_j| ≥ β (boolean).
  *
  * Similarity edges are emitted in both directions so graph queries need
  * no symmetric closure.
  */
object SchemaBuilder {

  /** User-defined similarity thresholds (α label, β boolean, θ content). */
  case class Thresholds(alpha: Double = 0.80, beta: Double = 0.90, theta: Double = 0.80)

  /** Metadata subgraph for the data lake (hierarchy + statistics). */
  def metadataGraph(spark: SparkSession, profiles: Dataset[ColumnProfile]): Dataset[Triple] = {
    import spark.implicits._
    profiles.flatMap { p =>
      val ds  = Lids.datasetUri(p.datasetName)
      val tbl = Lids.tableUri(p.datasetName, p.tableName)
      val c   = Lids.columnUri(p.datasetName, p.tableName, p.columnName)
      val g   = Lids.DefaultGraph
      Seq(
        Triple(g, ds, Lids.Prop.RdfType, Lids.Cls.Dataset),
        Triple(g, ds, Lids.Prop.HasLabel, p.datasetName),
        Triple(g, tbl, Lids.Prop.RdfType, Lids.Cls.Table),
        Triple(g, tbl, Lids.Prop.HasLabel, p.tableName),
        Triple(g, tbl, Lids.Prop.IsPartOf, ds),
        Triple(g, c, Lids.Prop.RdfType, Lids.Cls.Column),
        Triple(g, c, Lids.Prop.HasLabel, p.columnName),
        Triple(g, c, Lids.Prop.IsPartOf, tbl),
        Triple(g, c, Lids.Prop.HasDataType, p.fgType),
        Triple(g, c, Lids.Prop.HasTotalRows, p.totalCount.toString),
        Triple(g, c, Lids.Prop.HasMissingCount, p.nullCount.toString),
        Triple(g, c, Lids.Prop.HasDistinctCount, p.distinctCount.toString),
      ) ++ (if (p.fgType == FineGrainedType.Boolean)
              Seq(Triple(g, c, Lids.Prop.HasTrueRatio, f"${p.trueRatio}%.4f"))
            else Nil)
    }.distinct()
  }

  /** Slim pair-phase projection of a profile (public: Catalyst codegen). */
  case class SlimCol(columnId: String, tableId: String, fgType: String,
                     trueRatio: Double, embedding: Array[Double],
                     labelEmbedding: Array[Double])

  /** Column-similarity edges (Alg. 3 lines 7–19).
    *
    * Implemented as a self-join on the fine-grained type with the build
    * side broadcast (profiles are a few MB even for the large lake; the
    * join key has only 7 values, so a shuffle join would collapse to ≤7
    * tasks), followed by a `flatMap` over pairs working on primitive
    * `Array[Double]` embeddings — the hot path of preprocessing, kept
    * boxing-free and skew-free.
    */
  def similarityGraph(spark: SparkSession, profiles: Dataset[ColumnProfile],
                      th: Thresholds = Thresholds()): Dataset[Triple] = {
    import spark.implicits._
    val slim = profiles.map(p => SlimCol(
      p.columnId, p.tableId, p.fgType, p.trueRatio, p.embedding, p.labelEmbedding))

    val fields = Seq("columnId", "tableId", "fgType", "trueRatio",
                     "embedding", "labelEmbedding")
    val pairs = slim.toDF().alias("a")
      .join(broadcast(slim.toDF().alias("b")),
        col("a.fgType") === col("b.fgType") &&
          col("a.tableId") =!= col("b.tableId") &&
          col("a.columnId") < col("b.columnId"))
      .select(struct(fields.map(f => col(s"a.$f").as(f)): _*).as("_1"),
              struct(fields.map(f => col(s"b.$f").as(f)): _*).as("_2"))
      .as[(SlimCol, SlimCol)]

    pairs.flatMap { case (p, q) =>
      val out = scala.collection.mutable.ArrayBuffer.empty[Triple]
      val labelSim = EmbeddingOps.cosine(p.labelEmbedding, q.labelEmbedding)
      if (labelSim >= th.alpha)
        out ++= bidir(p.columnId, q.columnId, Lids.Prop.LabelSimilarity, labelSim)
      val contentSim =
        if (p.fgType == FineGrainedType.Boolean) 1.0 - math.abs(p.trueRatio - q.trueRatio)
        else EmbeddingOps.cosine(p.embedding, q.embedding)
      val contentTh = if (p.fgType == FineGrainedType.Boolean) th.beta else th.theta
      if (contentSim >= contentTh)
        out ++= bidir(p.columnId, q.columnId, Lids.Prop.ContentSimilarity, contentSim)
      out
    }
  }

  private def bidir(ci: String, cj: String, pred: String, score: Double): Seq[Triple] = {
    val ui = Lids.ResourcePrefix + ci
    val uj = Lids.ResourcePrefix + cj
    Seq(Triple(Lids.DefaultGraph, ui, pred, uj, score),
        Triple(Lids.DefaultGraph, uj, pred, ui, score))
  }

  /** Full data global schema: metadata ∪ similarity edges (Alg. 3). */
  def build(spark: SparkSession, profiles: Dataset[ColumnProfile],
            th: Thresholds = Thresholds()): Dataset[Triple] =
    metadataGraph(spark, profiles).union(similarityGraph(spark, profiles, th))
}
