package repro.core.automl

import repro.core.graph.Lids
import repro.substrate.ml.VectorIndex
import repro.substrate.rdf.{Term, TriplePattern, TripleStore}

/** Hyperparameter recommendation from the LiDS graph (§4.4, §6.3.3).
  *
  * The LiDS graph stores, for every ML-estimator call, the complete set
  * of (hyperparameter name, value) pairs — including implicit positional
  * and default ones recovered by documentation analysis. For an unseen
  * dataset, KGLiDS finds the most similar dataset in the graph (cosine
  * over table embeddings), collects the estimator calls of that
  * dataset's top-voted pipelines, and returns the most common value per
  * hyperparameter. KGpip uses this as the starting point that prunes its
  * search space.
  */
object HyperparamRecommender {

  /** Most-common hyperparameter values used with `estimator` (a dotted
    * library path) on the table most similar to `queryEmbedding`.
    *
    * @param tableIndex table-embedding index over the KG's tables
    */
  def recommend(store: TripleStore, tableIndex: VectorIndex,
                queryEmbedding: Array[Double], estimator: String,
                topPipelines: Int = 20): Map[String, String] = {
    tableIndex.nearest(queryEmbedding) match {
      case None => Map.empty
      case Some((tableId, _)) =>
        val params = paramsUsedWith(store, tableId, estimator, topPipelines)
        params
          .groupBy(_._1)
          .map { case (name, vs) =>
            name -> vs.groupBy(_._2).maxBy { case (v, g) => (g.size, v) }._1
          }
    }
  }

  /** All (param, value) pairs of `estimator` calls in the top-voted
    * pipelines that read `tableId`.
    */
  def paramsUsedWith(store: TripleStore, tableId: String, estimator: String,
                     topPipelines: Int): Seq[(String, String)] = {
    val tableUri = Lids.ResourcePrefix + tableId
    val rows = store.select(Seq(
      TriplePattern(Term("?s1"), Term.Lit(Lids.Prop.ReadsTable), Term.Lit(tableUri),
                    graph = Some(Term.Var("g"))),
      TriplePattern(Term("?p"), Term.Lit(Lids.Prop.HasVotes), Term("?votes"),
                    graph = Some(Term.Var("g"))),
      TriplePattern(Term("?s2"), Term.Lit(Lids.Prop.CallsFunction),
                    Term.Lit(Lids.libraryUri(estimator)), graph = Some(Term.Var("g"))),
      TriplePattern(Term("?s2"), Term.Lit(Lids.Prop.HasParameter), Term("?param"),
                    graph = Some(Term.Var("g"))),
    )).select("g", "votes", "param").distinct().collect()

    rows.toSeq
      .map(r => (r.getString(0), r.getString(1).toInt, r.getString(2)))
      .groupBy(_._1).toSeq
      .sortBy { case (g, entries) => (-entries.head._2, g) } // top-voted first
      .take(topPipelines)
      .flatMap(_._2.map(_._3))
      .flatMap { kv =>
        kv.split("=", 2) match {
          case Array(k, v) => Some(k -> v)
          case _           => None
        }
      }
  }
}
