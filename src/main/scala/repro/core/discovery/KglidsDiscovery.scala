package repro.core.discovery

import org.apache.spark.sql.SparkSession

import repro.core.graph.{LidsGraphBuilder, SchemaBuilder}
import repro.core.profile.DataProfiler
import repro.data.Lake
import repro.substrate.rdf.{LocalGraphIndex, TripleStore}

/** KGLiDS as a data-discovery *system* for the Table 2 harness:
  * `preprocess` is the offline phase (Spark profiling → Alg. 3 schema →
  * triple store → load into the serving index, the GraphDB analogue);
  * `queryUnionable` is the online top-k query.
  */
object KglidsDiscovery {

  /** The system state after preprocessing a lake. */
  case class Prepared(store: TripleStore, index: LocalGraphIndex)

  def preprocess(spark: SparkSession, lake: Lake,
                 th: SchemaBuilder.Thresholds = SchemaBuilder.Thresholds()): Prepared =
    preprocessCells(spark, lake.cells(spark), th)

  /** Preprocess from a pre-materialized cells DataFrame — the Table 2
    * harness stages the synthetic data once outside the timed section
    * (the baselines also receive the generated lake for free).
    */
  def preprocessCells(spark: SparkSession, cells: org.apache.spark.sql.DataFrame,
                      th: SchemaBuilder.Thresholds = SchemaBuilder.Thresholds()): Prepared = {
    // cache: the metadata branch and both sides of the pairwise join
    // reuse the profiles — without this, profiling reruns 3×
    def t[A](phase: String)(body: => A): A = {
      val t0 = System.nanoTime()
      val a  = body
      Console.err.println(f"[KglidsDiscovery] $phase: ${(System.nanoTime() - t0) / 1e9}%.2f s")
      a
    }
    val profiles = t("profile") {
      val p = DataProfiler.profileCells(spark, cells).cache(); p.count(); p
    }
    val store = t("schema+store") {
      val s = LidsGraphBuilder.buildDatasetGraph(spark, profiles, th)
      s.df.count() // force materialization — preprocessing ends here
      s
    }
    val prepared = t("index-load")(Prepared(store, LocalGraphIndex.fromStore(store)))
    profiles.unpersist()
    prepared
  }

  /** Online top-k unionable-table query (tableId = "<lake>/<table>"). */
  def queryUnionable(p: Prepared, tableId: String, k: Int): Seq[(String, Double)] =
    UnionSearch.topKUnionableIndexed(p.index, tableId, k)
}
