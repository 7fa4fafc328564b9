package repro.bench

import repro.SparkSpec

/** Table 2 — preprocessing + average query time, SANTOS vs Starmie vs
  * KGLiDS, plus P/R@k (the Fig. 5 accuracy signal) from the same runs.
  */
class Table2Bench extends SparkSpec {

  private lazy val rows = Table2Harness.run(spark)

  private def sys(bench: String, system: String) =
    rows.find(r => r.benchmark == bench && r.system == system).get

  test("TABLE 2 — Preprocessing and average query time") {
    println("\n================ TABLE 2: Discovery system performance ================")
    println(Table2Harness.format(rows))
    assert(rows.size == 12)
  }
  test("KGLiDS beats SANTOS in preprocessing at scale (7.3x claim, directionally)") {
    // At the lite scale, Spark's fixed job overhead dominates the small
    // lakes (the paper ran a 64-core server); the scalability claim is
    // made on the largest lake, where real work dominates overhead.
    val b = "santos_lite_large"
    assert(sys(b, "KGLiDS").preprocessSec < sys(b, "SANTOS").preprocessSec,
      s"$b: KGLiDS prep must beat SANTOS")
  }
  test("KGLiDS beats SANTOS in average query time on every benchmark") {
    rows.map(_.benchmark).distinct.foreach { b =>
      assert(sys(b, "KGLiDS").avgQuerySec < sys(b, "SANTOS").avgQuerySec,
        s"$b: KGLiDS query must beat SANTOS")
    }
  }
  test("KGLiDS large-lake preprocessing is within 3x of Starmie's") {
    // The paper's 1.8x win over Starmie comes from Starmie fine-tuning a
    // 110M-parameter LM per lake (GPU-hours); our Starmie substrate is a
    // hash encoder whose training is orders of magnitude cheaper, so the
    // absolute ordering does not carry to lite scale — the bound below
    // (plus the SANTOS ordering above) is the reproducible part. See
    // EXPERIMENTS.md §Table 2.
    val b = "santos_lite_large"
    assert(sys(b, "KGLiDS").preprocessSec < 3.0 * sys(b, "Starmie").preprocessSec,
      s"KGLiDS ${sys(b, "KGLiDS").preprocessSec}s vs Starmie ${sys(b, "Starmie").preprocessSec}s")
  }
  test("KGLiDS query latency beats Starmie on the large lake (3.3x claim)") {
    val b = "santos_lite_large"
    assert(sys(b, "KGLiDS").avgQuerySec < sys(b, "Starmie").avgQuerySec)
  }
  test("KGLiDS accuracy is comparable or better on the hard (D3L) lake") {
    val b = "d3l_lite"
    val k = sys(b, "KGLiDS")
    assert(k.recallAtK >= sys(b, "Starmie").recallAtK - 0.05,
      s"KGLiDS recall ${k.recallAtK} vs Starmie ${sys(b, "Starmie").recallAtK}")
    assert(k.recallAtK >= sys(b, "SANTOS").recallAtK - 0.05,
      s"KGLiDS recall ${k.recallAtK} vs SANTOS ${sys(b, "SANTOS").recallAtK}")
  }
  test("all systems achieve non-trivial recall on the synthetic lakes") {
    rows.filter(_.benchmark != "d3l_lite").foreach { r =>
      assert(r.recallAtK > 0.2, s"${r.benchmark}/${r.system} recall ${r.recallAtK}")
    }
  }
}
