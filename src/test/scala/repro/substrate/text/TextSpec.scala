package repro.substrate.text

import org.scalacheck.{Gen, Prop}

import repro.{PropSpec, SparkSpec}

/** Tokenizer, word-embedding, and NER substrate tests. */
class TextSpec extends SparkSpec with PropSpec {

  // ------------------------------------------------------------ Tokenizer
  test("tokenize splits snake_case") {
    assert(Tokenizer.tokenize("area_sq_ft") == Seq("area", "sq", "ft"))
  }
  test("tokenize splits camelCase") {
    assert(Tokenizer.tokenize("orderDateValue") == Seq("order", "date", "value"))
  }
  test("tokenize splits kebab and spaces") {
    assert(Tokenizer.tokenize("unit-price per item") == Seq("unit", "price", "per", "item"))
  }
  test("tokenize lowercases") {
    assert(Tokenizer.tokenize("TotalPrice") == Seq("total", "price"))
  }
  test("tokenize drops digits and punctuation") {
    assert(Tokenizer.tokenize("A1B-2C3") == Seq("a", "b", "c"))
    assert(Tokenizer.tokenize("12345").isEmpty)
  }
  test("tokenize of null and empty is empty") {
    assert(Tokenizer.tokenize(null).isEmpty)
    assert(Tokenizer.tokenize("").isEmpty)
  }
  test("isOpaque detects pure codes") {
    assert(Tokenizer.isOpaque("12345"))
    assert(Tokenizer.isOpaque("___"))
    assert(!Tokenizer.isOpaque("price_usd"))
  }
  test("tokenize never throws (property)") {
    checkProp(Prop.forAll(Gen.asciiStr) { s => Tokenizer.tokenize(s); true })
  }

  // -------------------------------------------------------- WordEmbedding
  test("word vectors are unit length") {
    val v = WordEmbedding.vector("price")
    assert(math.abs(math.sqrt(v.map(x => x * x).sum) - 1.0) < 1e-9)
  }
  test("word vectors are deterministic") {
    assert(WordEmbedding.vector("salary").sameElements(WordEmbedding.vector("salary")))
  }
  test("synonyms share a vector") {
    assert(WordEmbedding.vector("price").sameElements(WordEmbedding.vector("cost")))
    assert(WordEmbedding.vector("qty").sameElements(WordEmbedding.vector("quantity")))
  }
  test("unrelated words have low similarity") {
    assert(WordEmbedding.labelSimilarity("price", "language") < 0.5)
  }
  test("identical labels have similarity 1") {
    assert(math.abs(WordEmbedding.labelSimilarity("unit_price", "unit_price") - 1.0) < 1e-9)
  }
  test("synonym-renamed labels are highly similar") {
    assert(WordEmbedding.labelSimilarity("item_price", "item_cost") > 0.99)
    assert(WordEmbedding.labelSimilarity("area_sq_ft", "area_sq_ft") >
           WordEmbedding.labelSimilarity("area_sq_ft", "weight_kg"))
  }
  test("partial token overlap gives intermediate similarity") {
    val s = WordEmbedding.labelSimilarity("customer_age", "customer_name")
    assert(s > 0.2 && s < 0.9)
  }
  test("labels with no tokens embed to zero") {
    assert(WordEmbedding.labelEmbedding("12345").forall(_ == 0.0))
    assert(WordEmbedding.labelSimilarity("12345", "price") == 0.0)
  }
  test("hasEmbedding covers vocabulary but not codes") {
    assert(WordEmbedding.hasEmbedding("good"))
    assert(WordEmbedding.hasEmbedding("price"))
    assert(WordEmbedding.hasEmbedding("qty")) // via synonym canonicalization
    assert(!WordEmbedding.hasEmbedding("zzqx"))
  }
  test("synonymsOf returns the group") {
    assert(WordEmbedding.synonymsOf("cost").contains("price"))
    assert(WordEmbedding.synonymsOf("nonexistentword") == Seq("nonexistentword"))
  }
  test("labelSimilarity is symmetric (property)") {
    val labels = Gen.oneOf("price", "unit_cost", "customer_name", "order_date",
                           "area_sq_m", "x1", "review_text")
    checkProp(Prop.forAll(labels, labels) { (a, b) =>
      math.abs(WordEmbedding.labelSimilarity(a, b) -
               WordEmbedding.labelSimilarity(b, a)) < 1e-9
    })
  }

  // ------------------------------------------------------------------ NER
  test("persons are recognized") {
    assert(Ner.entityType("James Smith").contains("PERSON"))
    assert(Ner.entityType("mary").contains("PERSON"))
  }
  test("countries and cities are recognized") {
    assert(Ner.entityType("Canada").contains("GPE_COUNTRY"))
    assert(Ner.entityType("Montreal").contains("GPE_CITY"))
  }
  test("languages, orgs, products, events are recognized") {
    assert(Ner.entityType("French").contains("LANGUAGE"))
    assert(Ner.entityType("Acme").contains("ORG"))
    assert(Ner.entityType("Aurora").contains("PRODUCT"))
    assert(Ner.entityType("Olympics").contains("EVENT"))
  }
  test("non-entities are rejected") {
    assert(Ner.entityType("great value for money").isEmpty)
    assert(Ner.entityType("12345").isEmpty)
    assert(Ner.entityType("").isEmpty)
  }
  test("majority voting over multi-token values") {
    assert(Ner.entityType("James Mary kettle").contains("PERSON"))
    assert(Ner.entityType("kettle toaster James").isEmpty)
  }
  test("isEntity consistent with entityType") {
    assert(Ner.isEntity("Tokyo"))
    assert(!Ner.isEntity("lovely product"))
  }
}
