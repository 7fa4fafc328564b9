package repro.core.embed

import repro.core.profile.{ColumnProfile, FineGrainedType}

/** Table (and dataset) embeddings — Eq. 1 of the paper.
  *
  * A table embeds as the concatenation, over the 6 embeddable
  * fine-grained types, of the mean CoLR embedding of its columns of that
  * type (zero block when the table has no column of the type):
  * 6 × 300 = 1800 dims. The cleaning model's variant aggregates only the
  * columns that contain missing values (§4.2).
  */
object TableEmbedding {

  /** Dimensionality of a table embedding. */
  val Dim: Int = FineGrainedType.Embeddable.size * ColrModel.Dim

  /** Eq. 1 over all columns of the table. */
  def fromProfiles(profiles: Seq[ColumnProfile]): Array[Double] =
    aggregate(profiles)

  /** §4.2 variant: aggregate only columns that contain missing values;
    * falls back to all columns when none are missing (so inference on a
    * clean table still produces a usable vector).
    */
  def forMissingValueColumns(profiles: Seq[ColumnProfile]): Array[Double] = {
    val withNulls = profiles.filter(_.nullCount > 0)
    aggregate(if (withNulls.nonEmpty) withNulls else profiles)
  }

  private def aggregate(profiles: Seq[ColumnProfile]): Array[Double] = {
    val byType = profiles.groupBy(_.fgType)
    EmbeddingOps.concat(FineGrainedType.Embeddable.map { t =>
      byType.get(t) match {
        case Some(cols) => EmbeddingOps.mean(cols.map(_.embedding))
        case None       => Array.fill(ColrModel.Dim)(0.0)
      }
    })
  }
}
