package repro.core.profile

import org.scalacheck.{Gen, Prop}

import repro.{PropSpec, SparkSpec}

/** Fine-grained type inference tests (§3.2). */
class TypeInferenceSpec extends SparkSpec with PropSpec {
  import FineGrainedType._

  test("integers") {
    assert(TypeInference.infer(Seq("1", "42", "-7", "+13")) == Int)
  }
  test("floats") {
    assert(TypeInference.infer(Seq("1.5", "2.25", "-0.5", "3e-2")) == Float)
  }
  test("int wins over float when all integral") {
    assert(TypeInference.infer(Seq("1", "2", "3")) == Int)
  }
  test("booleans in several spellings") {
    assert(TypeInference.infer(Seq("true", "False", "YES", "no", "t", "f")) == Boolean)
  }
  test("iso dates") {
    assert(TypeInference.infer(Seq("2020-01-05", "1999-12-31")) == Date)
  }
  test("slash dates") {
    assert(TypeInference.infer(Seq("01/05/2020", "31/12/1999")) == Date)
  }
  test("named entities") {
    assert(TypeInference.infer(Seq("Canada", "France", "Japan", "Brazil")) == NamedEntity)
    assert(TypeInference.infer(Seq("James Smith", "Mary Johnson")) == NamedEntity)
  }
  test("natural language") {
    assert(TypeInference.infer(Seq(
      "great product really love it", "terrible quality would not recommend",
      "good value for the price")) == NaturalLanguage)
  }
  test("generic strings: postal codes and ids") {
    assert(TypeInference.infer(Seq("H3G 1M8", "K1A 0B1", "M5V 2T6")) == Str)
    assert(TypeInference.infer(Seq("PRD-1832", "PRD-9210")) == Str)
  }
  test("noise tolerance: a few dirty cells do not flip a numeric column") {
    val vals = Seq.fill(98)("7") :+ "n/a" :+ "?"
    assert(TypeInference.infer(vals) == Int)
  }
  test("empty and null-only samples degrade to string") {
    assert(TypeInference.infer(Seq.empty) == Str)
    assert(TypeInference.infer(Seq(null, "", "  ")) == Str)
  }
  test("decision order: NER beats natural-language for entity columns") {
    // country names are also vocabulary words sometimes; NER is checked first
    assert(TypeInference.infer(Seq("Canada", "Germany", "Poland")) == NamedEntity)
  }
  test("all 7 types are reachable") {
    val inferred = Set(
      TypeInference.infer(Seq("1")), TypeInference.infer(Seq("1.5")),
      TypeInference.infer(Seq("true")), TypeInference.infer(Seq("2020-01-01")),
      TypeInference.infer(Seq("Canada")),
      TypeInference.infer(Seq("really good product quality")),
      TypeInference.infer(Seq("X9Z-12")))
    assert(inferred == All.toSet)
  }
  test("property: generated ints always infer int") {
    checkProp(Prop.forAll(Gen.nonEmptyListOf(Gen.chooseNum(-100000L, 100000L))) { xs =>
      TypeInference.infer(xs.map(_.toString)) == Int
    })
  }
  test("property: generated doubles infer a numeric type") {
    checkProp(Prop.forAll(Gen.nonEmptyListOf(Gen.chooseNum(-1e6, 1e6))) { xs =>
      val t = TypeInference.infer(xs.map(_.toString))
      t == Float || t == Int
    })
  }
}
