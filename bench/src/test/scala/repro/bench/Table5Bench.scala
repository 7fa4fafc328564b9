package repro.bench

import repro.SparkSpec

/** Table 5 — data cleaning: Baseline / HoloClean / KGLiDS F1 + Fig. 7
  * time/memory shape.
  */
class Table5Bench extends SparkSpec {

  private lazy val rows = Table5Harness.run(spark)

  test("TABLE 5 — Data cleaning F1 scores") {
    println("\n================ TABLE 5: Data cleaning ================")
    println(Table5Harness.format(rows))
    assert(rows.size == 13)
  }
  test("KGLiDS completes every dataset (no OOM)") {
    assert(rows.forall(_.kglidsF1 >= 0.0))
    assert(rows.forall(_.recommendedOp.nonEmpty))
  }
  test("HoloClean OOMs on the three largest datasets, as in the paper") {
    val oom = rows.filter(_.holocleanF1.isEmpty).map(_.id).toSet
    assert(Set(11, 12, 13).subsetOf(oom), s"expected 11-13 OOM, got $oom")
  }
  test("HoloClean completes the small datasets") {
    assert(rows.filter(_.id <= 8).forall(_.holocleanF1.nonEmpty))
  }
  test("drop-nulls baseline collapses on mostly-missing datasets (00.00 rows)") {
    val collapsed = rows.filter(r => Set(2, 8, 13).contains(r.id))
    assert(collapsed.forall(_.baselineF1 < 30.0),
      collapsed.map(r => s"${r.id}:${r.baselineF1}").mkString(", "))
  }
  test("KGLiDS rescues the mostly-missing datasets") {
    rows.filter(r => Set(2, 8, 13).contains(r.id)).foreach { r =>
      assert(r.kglidsF1 > r.baselineF1 + 10.0,
        s"${r.id}: kglids ${r.kglidsF1} vs baseline ${r.baselineF1}")
    }
  }
  test("KGLiDS is comparable to or better than HoloClean on average") {
    val both = rows.flatMap(r => r.holocleanF1.map(h => (r.kglidsF1, h)))
    val kAvg = both.map(_._1).sum / both.size
    val hAvg = both.map(_._2).sum / both.size
    assert(kAvg >= hAvg - 3.0, f"KGLiDS avg $kAvg%.2f vs HoloClean avg $hAvg%.2f")
  }
  test("KGLiDS cleaning time stays flat while HoloClean's grows (85%-faster claim)") {
    // On tiny datasets Spark's fixed per-job latency hides KGLiDS's
    // advantage; the paper's claim reproduces as a scaling shape — on
    // the largest dataset HoloClean completes, KGLiDS is faster, and
    // HoloClean's time grows faster with dataset size.
    val completed = rows.filter(_.holocleanF1.nonEmpty).sortBy(_.rows)
    val largest   = completed.last
    assert(largest.kglidsSec < largest.holoSec,
      s"largest completed (${largest.name}): KGLiDS ${largest.kglidsSec}s vs HoloClean ${largest.holoSec}s")
    val holoGrowth = largest.holoSec / math.max(0.01, completed.head.holoSec)
    val kgGrowth   = largest.kglidsSec / math.max(0.01, completed.head.kglidsSec)
    assert(holoGrowth > kgGrowth,
      f"HoloClean growth $holoGrowth%.1fx must exceed KGLiDS growth $kgGrowth%.1fx")
  }
  test("KGLiDS memory is fixed-size and tiny (paper: <4GB flat; here <1MB)") {
    assert(rows.forall(_.kglidsMemMb < 1.0))
    // HoloClean memory grows with dataset size
    val holoMems = rows.filter(_.holocleanF1.nonEmpty).sortBy(_.rows).map(_.holoMemMb)
    assert(holoMems.last > holoMems.head)
  }
}
