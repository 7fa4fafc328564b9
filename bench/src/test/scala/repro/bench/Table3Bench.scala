package repro.bench

import repro.SparkSpec

/** Table 3 — KG size + analysis time, KGLiDS vs GraphGen4Code. */
class Table3Bench extends SparkSpec {

  private lazy val result = Table3Harness.run(spark, corpusSize = 300)

  test("TABLE 3 — Graph comparison on the pipeline corpus") {
    println("\n================ TABLE 3: KGLiDS vs GraphGen4Code ================")
    println(Table3Harness.format(result))
    assert(result.kglids.triples > 0 && result.g4c.triples > 0)
  }
  test("KGLiDS produces a substantially smaller graph (82% reduction claim)") {
    assert(result.triplesReduction > 0.5,
      f"reduction ${result.triplesReduction * 100}%.1f%% must exceed 50%%")
  }
  test("KGLiDS produces far fewer unique nodes") {
    assert(result.kglids.uniqueNodes < result.g4c.uniqueNodes)
  }
  test("KGLiDS graph serializes smaller") {
    assert(result.kglids.sizeMb < result.g4c.sizeMb)
  }
  test("KGLiDS analysis is faster (95% less time claim, directionally)") {
    assert(result.kglids.analysisSec < result.g4c.analysisSec,
      s"KGLiDS ${result.kglids.analysisSec}s vs G4C ${result.g4c.analysisSec}s")
  }
}
