package repro.bench

import repro.SparkSpec

/** Table 4 — graph breakdown by modelled aspect. */
class Table4Bench extends SparkSpec {

  private lazy val result = Table4Harness.run(spark, corpusSize = 300)

  test("TABLE 4 — Breakdown by modelled aspect") {
    println("\n================ TABLE 4: Graph breakdown by aspect ================")
    println(Table4Harness.format(result))
    assert(result.kglids.total > 0 && result.g4c.total > 0)
  }
  test("KGLiDS models data-science aspects G4C lacks") {
    assert(result.kglids.byAspect.contains("Dataset reads"))
    assert(result.kglids.byAspect.contains("Library hierarchy"))
    assert(result.kglids.byAspect.contains("RDF node types"))
    assert(!result.g4c.byAspect.contains("Dataset reads"))
    assert(!result.g4c.byAspect.contains("Library hierarchy"))
    assert(!result.g4c.byAspect.contains("RDF node types"))
  }
  test("G4C models local syntactic aspects KGLiDS omits") {
    assert(result.g4c.byAspect.contains("Statement location"))
    assert(result.g4c.byAspect.contains("Variable names"))
    assert(result.g4c.byAspect.contains("Func. parameter order"))
    assert(!result.kglids.byAspect.contains("Statement location"))
    assert(!result.kglids.byAspect.contains("Variable names"))
  }
  test("G4C's local-syntax share is substantial (paper: ~30%)") {
    val localShare = result.g4c.share("Statement location") +
      result.g4c.share("Variable names") + result.g4c.share("Func. parameter order")
    assert(localShare > 0.15, f"local-syntax share ${localShare * 100}%.1f%%")
  }
  test("both systems model flow, parameters, and statement text") {
    Seq("Code flow", "Data flow", "Control flow type", "Func. parameters",
        "Statement text", "Library calls", "Column reads").foreach { a =>
      assert(result.kglids.byAspect.contains(a), s"KGLiDS missing $a")
      assert(result.g4c.byAspect.contains(a), s"G4C missing $a")
    }
  }
  test("aspect shares cover most of both graphs") {
    val kCover = Table4Harness.AspectOrder.map(result.kglids.share).sum
    val gCover = Table4Harness.AspectOrder.map(result.g4c.share).sum
    assert(kCover > 0.95, f"KGLiDS aspect coverage ${kCover * 100}%.1f%%")
    assert(gCover > 0.95, f"G4C aspect coverage ${gCover * 100}%.1f%%")
  }
}
