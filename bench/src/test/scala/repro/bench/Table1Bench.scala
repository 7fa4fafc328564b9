package repro.bench

import repro.SparkSpec
import repro.core.profile.FineGrainedType

/** Table 1 — benchmark statistics with the profiler's type breakdown. */
class Table1Bench extends SparkSpec {

  private lazy val rows = Table1Harness.run(spark)

  test("TABLE 1 — Data Discovery Benchmarks") {
    println("\n================ TABLE 1: Data Discovery Benchmarks ================")
    println(Table1Harness.format(rows))
    assert(rows.size == 4)
  }
  test("lakes scale like the paper's: SANTOS-large is the biggest") {
    val large = rows.find(_.name == "santos_lite_large").get
    assert(rows.forall(r => r.name == large.name || r.nTables < large.nTables))
    assert(rows.forall(r => r.name == large.name || r.totalColumns < large.totalColumns))
  }
  test("the profiler assigns every fine-grained type across the lakes") {
    val seen = rows.flatMap(_.typeCounts.keys).toSet
    assert(FineGrainedType.All.toSet.subsetOf(seen))
  }
  test("type counts sum to total columns per lake") {
    rows.foreach(r => assert(r.typeCounts.values.sum == r.totalColumns))
  }
  test("query tables have unionable ground truth") {
    rows.foreach(r => assert(r.avgUnionable >= 1.0))
  }
}
