package repro.core.discovery

import repro.SparkSpec
import repro.core.graph.{LidsGraphBuilder, SchemaBuilder}
import repro.core.profile.DataProfiler
import repro.data.LakeBench
import repro.substrate.rdf.LocalGraphIndex

/** Union/join discovery and the pre-defined operations over a small
  * synthetic lake with known ground truth.
  */
class DiscoverySpec extends SparkSpec {

  private lazy val lake = LakeBench.generate(
    LakeBench.Spec("disco", nFamilies = 4, partitionsPerFamily = 3, baseRows = 150,
                   colsMin = 5, colsMax = 7, hard = false, nQuery = 4, seed = 42))

  private lazy val profiles =
    DataProfiler.profileCells(spark, lake.cells(spark)).cache()
  private lazy val store =
    LidsGraphBuilder.buildDatasetGraph(spark, profiles, SchemaBuilder.Thresholds())
  private lazy val index = LocalGraphIndex.fromStore(store)

  private def tid(t: String) = s"${lake.name}/$t"

  test("top-k unionable recovers the ground-truth family") {
    val q   = lake.queryTables.head
    val got = UnionSearch.topKUnionableIndexed(index, tid(q), 2).map(_._1).toSet
    val gt  = lake.unionableGroundTruth(q).map(tid)
    assert(got == gt, s"expected $gt got $got")
  }
  test("unionable scores are in (0, 1] and sorted descending") {
    val res = UnionSearch.topKUnionableIndexed(index, tid(lake.queryTables.head), 10)
    assert(res.nonEmpty)
    assert(res.forall { case (_, s) => s > 0 && s <= 1.0 + 1e-9 })
    assert(res.map(_._2) == res.map(_._2).sorted.reverse)
  }
  test("ground-truth family ranks above other families for every query") {
    lake.queryTables.foreach { q =>
      val gt  = lake.unionableGroundTruth(q).map(tid)
      val res = UnionSearch.topKUnionableIndexed(index, tid(q), lake.tables.size)
      val topGt = res.take(gt.size).map(_._1).toSet
      assert((topGt intersect gt).nonEmpty, s"family of $q must appear at the top")
    }
  }
  test("BGP path and indexed path agree") {
    val q = tid(lake.queryTables.head)
    val viaBgp   = UnionSearch.topKUnionable(store, q, 5)
    val viaIndex = UnionSearch.topKUnionableIndexed(index, q, 5)
    assert(viaBgp.map(_._1) == viaIndex.map(_._1))
    viaBgp.zip(viaIndex).foreach { case ((_, a), (_, b)) => assert(math.abs(a - b) < 1e-9) }
  }
  test("joinable tables share content-similar columns") {
    val q   = lake.queryTables.head
    val res = JoinSearch.topKJoinable(store, tid(q), 5)
    assert(res.nonEmpty)
    assert(res.forall(_._2 > 0))
  }
  test("join paths within the family exist and respect hop budget") {
    val q  = lake.queryTables.head
    val gt = lake.unionableGroundTruth(q).toSeq.sorted
    val paths = JoinSearch.joinPaths(store, tid(q), tid(gt.head), hops = 2)
    assert(paths.nonEmpty)
    assert(paths.forall(_.size <= 3))
    assert(paths.forall(p => p.head == tid(q) && p.last == tid(gt.head)))
  }
  test("shortest path is minimal") {
    val q  = lake.queryTables.head
    val gt = lake.unionableGroundTruth(q).toSeq.sorted
    val sp = JoinSearch.shortestPath(store, tid(q), tid(gt.head))
    assert(sp.isDefined)
    assert(sp.get.size == 2) // directly joinable (same family)
  }
  test("searchTables finds tables by column keyword groups") {
    val q       = lake.tables.find(_.name == lake.queryTables.head).get
    val keyword = q.columns.head.split('_').last
    val res = PredefinedOps.searchTables(store, Seq(Seq(keyword))).collect()
    assert(res.nonEmpty)
    assert(res.map(_.getString(0)).contains(tid(q.name)))
  }
  test("searchTables with an impossible conjunction is empty") {
    assert(PredefinedOps.searchTables(store,
      Seq(Seq("zzzz_not_a_column"))).count() == 0)
  }
  test("findUnionableColumns returns matched pairs for family tables") {
    val q  = lake.queryTables.head
    val gt = lake.unionableGroundTruth(q).toSeq.sorted
    val pairs = PredefinedOps.findUnionableColumns(store, tid(q), tid(gt.head)).collect()
    assert(pairs.nonEmpty)
    assert(pairs.forall(_.getDouble(2) > 0))
  }
}
