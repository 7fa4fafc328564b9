package repro.substrate.text

import scala.util.hashing.MurmurHash3

/** Offline substitute for GloVe word embeddings combined with WordNet
  * synonymy (paper refs [22, 42]).
  *
  * Every token receives a deterministic unit vector seeded by the hash of
  * its *canonical* form: members of a synonym group share one canonical
  * form and therefore share one vector. Label similarity between column
  * names is then driven by token overlap and synonymy — the same signal
  * pre-trained word vectors provide for short column headers.
  *
  * `hasEmbedding` plays the role of "a pre-trained embedding exists for
  * this token" used by the fine-grained type inference to detect
  * natural-language columns: it checks membership in an English
  * vocabulary (below) rather than hashing, so opaque IDs/codes are
  * correctly reported as embedding-less.
  */
object WordEmbedding {

  /** Dimensionality of word and label vectors. */
  val Dim = 50

  /** Synonym groups; every member maps to the group's first word. */
  private val synonymGroups: Seq[Seq[String]] = Seq(
    Seq("id", "identifier", "key", "code"),
    Seq("name", "title", "label"),
    Seq("price", "cost", "amount", "fare"),
    Seq("quantity", "qty", "count", "num"),
    Seq("date", "day", "time", "timestamp"),
    Seq("country", "nation"),
    Seq("city", "town", "municipality"),
    Seq("address", "addr", "location"),
    Seq("phone", "telephone", "tel", "mobile"),
    Seq("latitude", "lat"),
    Seq("longitude", "lon", "lng"),
    Seq("salary", "wage", "pay", "income"),
    Seq("score", "rating", "grade"),
    Seq("sex", "gender"),
    Seq("age", "years"),
    Seq("area", "surface", "size"),
    Seq("weight", "mass"),
    Seq("height", "stature"),
    Seq("revenue", "sales", "turnover"),
    Seq("customer", "client", "buyer"),
    Seq("product", "item", "article"),
    Seq("comment", "review", "feedback", "remark"),
    Seq("description", "desc", "summary"),
    Seq("active", "enabled", "valid"),
    Seq("category", "type", "kind", "class"),
    Seq("state", "province", "region"),
    Seq("company", "organization", "org", "firm"),
    Seq("employee", "worker", "staff"),
    Seq("begin", "start", "open"),
    Seq("end", "finish", "close"),
  )

  private val canonicalOf: Map[String, String] =
    synonymGroups.flatMap(g => g.map(_ -> g.head)).toMap

  /** English vocabulary for natural-language detection. Covers the words
    * the synthetic text generators draw from plus common English filler.
    */
  private val baseVocabulary: Set[String] = Set(
    // common function words
    "the", "a", "an", "and", "or", "but", "of", "to", "in", "on", "for",
    "with", "is", "was", "are", "were", "it", "this", "that", "very",
    "not", "no", "yes", "as", "at", "by", "from", "be", "been", "has",
    "have", "had", "will", "would", "can", "could", "should", "my", "our",
    "your", "their", "his", "her", "its", "we", "they", "you", "i", "so",
    "too", "also", "than", "then", "there", "here", "when", "what", "how",
    // sentiment / review words (generators draw from these)
    "good", "bad", "great", "terrible", "excellent", "poor", "amazing",
    "awful", "nice", "horrible", "love", "hate", "like", "dislike",
    "recommend", "avoid", "best", "worst", "better", "worse", "happy",
    "sad", "disappointed", "satisfied", "pleased", "angry", "fast",
    "slow", "cheap", "expensive", "quality", "value", "service",
    "delivery", "arrived", "broken", "perfect", "works", "worked",
    "bought", "buy", "purchase", "purchased", "returned", "return",
    "refund", "seller", "shipping", "package", "ordered", "order",
    "received", "using", "used", "use", "easy", "hard", "difficult",
    "simple", "comfortable", "durable", "sturdy", "flimsy", "beautiful",
    "ugly", "bright", "dark", "light", "heavy", "small", "large", "big",
    "tiny", "huge", "long", "short", "wide", "narrow", "thick", "thin",
    "really", "quite", "extremely", "somewhat", "highly", "truly",
    "definitely", "probably", "maybe", "never", "always", "often",
    "sometimes", "again", "once", "twice", "daily", "weekly", "monthly",
    // domain words
    "customer", "client", "product", "item", "store", "shop", "market",
    "house", "home", "car", "vehicle", "food", "drink", "water", "coffee",
    "book", "movie", "music", "game", "phone", "computer", "screen",
    "battery", "camera", "sound", "color", "material", "plastic", "metal",
    "wood", "glass", "leather", "cotton", "money", "dollar", "euro",
    "price", "cost", "tax", "discount", "deal", "offer", "brand", "model",
    "version", "update", "feature", "design", "style", "fit", "wear",
    "clean", "dirty", "new", "old", "fresh", "stale", "warm", "cold",
    "hot", "cool", "dry", "wet", "soft", "firm", "smooth", "rough",
    "family", "friend", "kid", "child", "baby", "dog", "cat", "pet",
    "work", "job", "office", "school", "travel", "trip", "hotel", "room",
    "flight", "train", "city", "country", "weather", "rain", "sun",
    "snow", "wind", "health", "doctor", "patient", "medicine", "pain",
    "sleep", "energy", "taste", "smell", "look", "feel", "fits", "size",
  ) ++ canonicalOf.keySet

  /** Stable, public sample of the vocabulary — synthetic text generators
    * draw natural-language values from it so type inference's
    * embedding-coverage test behaves like GloVe coverage does on real
    * review/comment columns.
    */
  lazy val sampleVocabulary: Seq[String] = baseVocabulary.toSeq.sorted

  /** Words from a synonym group, for benchmark column renaming. */
  def synonymsOf(word: String): Seq[String] = {
    val c = canonical(word)
    synonymGroups.find(_.head == c).getOrElse(Seq(word))
  }

  /** Canonical (synonym-collapsed) form of a token. */
  def canonical(word: String): String =
    canonicalOf.getOrElse(word.toLowerCase, word.toLowerCase)

  /** Whether a pre-trained embedding exists for this token (vocabulary
    * membership — the GloVe-coverage stand-in used by type inference).
    */
  def hasEmbedding(word: String): Boolean =
    baseVocabulary.contains(word.toLowerCase) ||
      baseVocabulary.contains(canonical(word))

  /** Deterministic unit vector for a token (shared across synonyms). */
  def vector(word: String): Array[Double] = {
    val seed = MurmurHash3.stringHash(canonical(word))
    val rng  = new java.util.Random(seed.toLong)
    val v    = Array.fill(Dim)(rng.nextGaussian())
    val norm = math.sqrt(v.map(x => x * x).sum)
    v.map(_ / norm)
  }

  /** Embedding of a multi-token label: mean of token vectors, normalized.
    * Returns the zero vector when the label has no alphabetic tokens.
    */
  def labelEmbedding(label: String): Array[Double] = {
    val toks = Tokenizer.tokenize(label)
    if (toks.isEmpty) return Array.fill(Dim)(0.0)
    val acc = Array.fill(Dim)(0.0)
    toks.foreach { t =>
      val v = vector(t)
      var i = 0
      while (i < Dim) { acc(i) += v(i); i += 1 }
    }
    val norm = math.sqrt(acc.map(x => x * x).sum)
    if (norm == 0.0) acc else acc.map(_ / norm)
  }

  /** Cosine similarity between the label embeddings of two strings. */
  def labelSimilarity(a: String, b: String): Double = {
    val va = labelEmbedding(a); val vb = labelEmbedding(b)
    var dot = 0.0; var i = 0
    while (i < Dim) { dot += va(i) * vb(i); i += 1 }
    dot
  }
}
