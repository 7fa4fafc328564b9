package repro.core.discovery

import scala.collection.mutable

import repro.core.graph.Lids
import repro.substrate.rdf.{Term, TriplePattern, TripleStore}

/** Joinable-table and join-path discovery (§3.3, §5).
  *
  * Two tables are joinable when they share a content-similar column pair
  * (overlapping values). `get_path_to_table` finds join paths up to a
  * hop budget by BFS over the joinability adjacency derived from the
  * similarity edges.
  */
object JoinSearch {

  /** Adjacency: tableId → joinable neighbour tableIds with best weight. */
  def joinableAdjacency(store: TripleStore): Map[String, Seq[(String, Double)]] = {
    val rows = store.select(Seq(
      TriplePattern(Term("?c1"), Term.Lit(Lids.Prop.ContentSimilarity), Term("?c2"),
                    weightVar = Some("w")),
      TriplePattern(Term("?c1"), Term.Lit(Lids.Prop.IsPartOf), Term("?t1")),
      TriplePattern(Term("?c2"), Term.Lit(Lids.Prop.IsPartOf), Term("?t2")),
    )).select("t1", "t2", "w").collect()
    rows.toSeq
      .map(r => (r.getString(0).stripPrefix(Lids.ResourcePrefix),
                 r.getString(1).stripPrefix(Lids.ResourcePrefix),
                 r.getDouble(2)))
      .filter { case (t1, t2, _) => t1 != t2 }
      .groupBy(_._1)
      .map { case (t1, es) =>
        t1 -> es.groupBy(_._2).map { case (t2, g) => (t2, g.map(_._3).max) }
          .toSeq.sortBy { case (t2, w) => (-w, t2) }
      }
  }

  /** Top-k joinable tables for one table. */
  def topKJoinable(store: TripleStore, tableId: String, k: Int): Seq[(String, Double)] =
    joinableAdjacency(store).getOrElse(tableId, Seq.empty).take(k)

  /** All join paths from `fromTable` to `toTable` within `hops` edges
    * (shortest first). Each path is a sequence of tableIds including
    * both endpoints.
    */
  def joinPaths(store: TripleStore, fromTable: String, toTable: String,
                hops: Int): Seq[Seq[String]] = {
    val adj = joinableAdjacency(store)
    val out = mutable.ArrayBuffer.empty[Seq[String]]
    val queue = mutable.Queue(Seq(fromTable))
    while (queue.nonEmpty) {
      val path = queue.dequeue()
      if (path.last == toTable && path.size > 1) out += path
      else if (path.size <= hops) {
        adj.getOrElse(path.last, Seq.empty).foreach { case (next, _) =>
          if (!path.contains(next)) queue.enqueue(path :+ next)
        }
      }
    }
    out.toSeq.sortBy(p => (p.size, p.mkString("→")))
  }

  /** Shortest join path between two tables, if one exists. */
  def shortestPath(store: TripleStore, fromTable: String, toTable: String,
                   maxHops: Int = 4): Option[Seq[String]] =
    joinPaths(store, fromTable, toTable, maxHops).headOption
}
