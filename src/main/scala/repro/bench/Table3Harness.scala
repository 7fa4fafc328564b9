package repro.bench

import org.apache.spark.sql.SparkSession

import repro.core.pipeline.PipelineAbstraction
import repro.data.PipelineCorpus
import repro.substrate.baselines.GraphGen4Code
import repro.substrate.rdf.TripleStore

/** Table 3 — RDF graph size + analysis time for KGLiDS vs GraphGen4Code
  * over the synthetic pipeline corpus.
  */
object Table3Harness {

  case class SystemStats(
      system: String,
      triples: Long,
      uniqueNodes: Long,
      uniqueEdgeTypes: Long,
      sizeMb: Double,
      analysisSec: Double,
  )

  case class Result(corpusSize: Int, kglids: SystemStats, g4c: SystemStats) {
    def triplesReduction: Double = 1.0 - kglids.triples.toDouble / g4c.triples
    def timeReduction: Double    = 1.0 - kglids.analysisSec / g4c.analysisSec
  }

  /** Abstract the corpus with both systems and collect stats.
    * Stores are materialized (count) inside the timed section, like the
    * paper's "analysis time" which includes graph generation.
    */
  def run(spark: SparkSession, corpusSize: Int = 300, seed: Long = 77): Result = {
    import spark.implicits._
    val corpus = spark.createDataset(
      PipelineCorpus.abstractionCorpus(corpusSize, seed)).cache()
    corpus.count()

    def measure(system: String)(
        build: => org.apache.spark.sql.Dataset[repro.substrate.rdf.Triple]): SystemStats = {
      val t0    = System.nanoTime()
      val store = TripleStore.fromDataset(build).cache()
      val triples = store.size // forces the full computation
      val sec   = (System.nanoTime() - t0) / 1e9
      val stats = SystemStats(system, triples, store.nodeCount,
        store.predicateCount, store.approxSerializedBytes / 1024.0 / 1024.0, sec)
      store.unpersist()
      stats
    }

    val kglids = measure("KGLiDS")(PipelineAbstraction.abstractCorpus(spark, corpus))
    val g4c    = measure("GraphGen4Code")(GraphGen4Code.abstractCorpus(spark, corpus))
    corpus.unpersist()
    Result(corpusSize, kglids, g4c)
  }

  def format(r: Result): String = {
    val sb = new StringBuilder
    sb.append(s"Corpus: ${r.corpusSize} synthetic pipelines\n")
    sb.append(f"${"Statistic"}%-24s${"KGLiDS"}%16s${"GraphGen4Code"}%16s\n")
    sb.append(f"${"No. triples (edges)"}%-24s${r.kglids.triples}%16d${r.g4c.triples}%16d\n")
    sb.append(f"${"No. unique nodes"}%-24s${r.kglids.uniqueNodes}%16d${r.g4c.uniqueNodes}%16d\n")
    sb.append(f"${"No. unique edges"}%-24s${r.kglids.uniqueEdgeTypes}%16d${r.g4c.uniqueEdgeTypes}%16d\n")
    sb.append(f"${"Size (MB)"}%-24s${r.kglids.sizeMb}%16.2f${r.g4c.sizeMb}%16.2f\n")
    sb.append(f"${"Analysis time (s)"}%-24s${r.kglids.analysisSec}%16.2f${r.g4c.analysisSec}%16.2f\n")
    sb.append(f"Graph reduction: ${r.triplesReduction * 100}%.1f%%   time reduction: ${r.timeReduction * 100}%.1f%%\n")
    sb.toString
  }
}
