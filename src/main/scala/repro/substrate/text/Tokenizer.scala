package repro.substrate.text

/** Splits labels, identifiers, and free text into lowercase word tokens.
  *
  * Handles the naming styles seen in data-lake column headers:
  * snake_case, kebab-case, camelCase, and plain sentences. Digits and
  * punctuation act as separators and are not kept as tokens, so values
  * like postal codes or IDs tokenize to nothing — which is exactly what
  * downstream natural-language detection relies on.
  */
object Tokenizer {

  // precompiled: tokenize runs on every cell value during profiling —
  // per-call Pattern.compile would dominate the profiler's runtime
  private val CamelBoundary = java.util.regex.Pattern.compile("([a-z0-9])([A-Z])")
  private val NonAlpha      = java.util.regex.Pattern.compile("[^a-z]+")

  // per-thread memo: profiling tokenizes the same cell value several
  // times (type inference, NER, CoLR), and dictionary-drawn values
  // repeat heavily within a column
  private val memo =
    ThreadLocal.withInitial[java.util.HashMap[String, Seq[String]]](
      () => new java.util.HashMap[String, Seq[String]]())
  private val MemoCap = 20000

  /** Tokenize a column label or free-text value into lowercase words. */
  def tokenize(s: String): Seq[String] = {
    if (s == null || s.isEmpty) return Seq.empty
    val cache = memo.get()
    val hit   = cache.get(s)
    if (hit != null) return hit
    val camelSplit = CamelBoundary.matcher(s).replaceAll("$1 $2")
    val toks = NonAlpha.split(camelSplit.toLowerCase)
      .iterator
      .filter(_.nonEmpty)
      .toSeq
    if (cache.size >= MemoCap) cache.clear()
    cache.put(s, toks)
    toks
  }

  /** True when the string contains no alphabetic tokens at all. */
  def isOpaque(s: String): Boolean = tokenize(s).isEmpty
}
