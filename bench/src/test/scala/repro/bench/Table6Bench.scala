package repro.bench

import repro.SparkSpec

/** Table 6 — data transformation: Baseline / AutoLearn / KGLiDS accuracy
  * + Fig. 8 time/memory shape.
  */
class Table6Bench extends SparkSpec {

  private lazy val rows = Table6Harness.run(spark)

  test("TABLE 6 — Data transformation accuracy") {
    println("\n================ TABLE 6: Data transformation ================")
    println(Table6Harness.format(rows))
    assert(rows.size == 17)
  }
  test("KGLiDS completes every dataset") {
    assert(rows.forall(_.kglidsAcc > 0.0))
  }
  test("AutoLearn completes the small datasets (ids 14-23)") {
    val small = rows.filter(_.id <= 23)
    assert(small.forall(_.autolearnAcc.nonEmpty),
      small.filter(_.autolearnAcc.isEmpty).map(r => s"${r.id}:${r.autolearnFail}").mkString(","))
  }
  test("AutoLearn times out on the large datasets, as in the paper") {
    val failed = rows.filter(r => r.id >= 24 && r.id <= 29)
    assert(failed.count(_.autolearnFail == "TO") >= 3,
      failed.map(r => s"${r.id}:${r.autolearnFail.ifEmpty}").mkString(","))
  }
  test("AutoLearn OOMs on poker (id 30)") {
    assert(rows.find(_.id == 30).get.autolearnFail == "OOM")
  }
  test("KGLiDS matches or beats the baseline on average") {
    val kAvg = rows.map(_.kglidsAcc).sum / rows.size
    val bAvg = rows.map(_.baselineAcc).sum / rows.size
    assert(kAvg >= bAvg, f"KGLiDS avg $kAvg%.2f vs baseline avg $bAvg%.2f")
  }
  test("KGLiDS beats the baseline on the majority of datasets") {
    val wins = rows.count(r => r.kglidsAcc >= r.baselineAcc - 0.5)
    assert(wins * 3 >= rows.size * 2, s"KGLiDS ≥ baseline on $wins of ${rows.size}")
  }
  test("KGLiDS matches or beats AutoLearn where AutoLearn completes") {
    val both = rows.flatMap(r => r.autolearnAcc.map(a => (r.kglidsAcc, a)))
    val kAvg = both.map(_._1).sum / both.size
    val aAvg = both.map(_._2).sum / both.size
    assert(kAvg >= aAvg - 2.0, f"KGLiDS avg $kAvg%.2f vs AutoLearn avg $aAvg%.2f")
  }
  test("KGLiDS time stays flat while AutoLearn grows with data size") {
    val kMax = rows.map(_.kglidsSec).max
    val aCompleted = rows.filter(_.autolearnAcc.nonEmpty)
    val aMax = (aCompleted.map(_.autoSec) ++
      rows.filter(_.autolearnFail == "TO").map(_.autoSec)).max
    assert(kMax < aMax * 3,
      f"KGLiDS max $kMax%.1fs should not dwarf AutoLearn max $aMax%.1fs")
  }
  test("KGLiDS memory is fixed-size (paper: <10GB flat; here <1MB)") {
    assert(rows.forall(_.kglidsMemMb < 1.0))
  }

  private implicit class StrOps(s: String) {
    def ifEmpty: String = if (s.isEmpty) "ok" else s
  }
}
