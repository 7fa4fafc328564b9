package repro.core.profile

/** The 7 fine-grained column data types of KGLiDS (§3.2).
  *
  * Pairwise column-similarity prediction is restricted to columns of the
  * same fine-grained type, which is the paper's main lever for cutting
  * false positives and pairwise-comparison cost.
  */
object FineGrainedType {
  val Int             = "int"
  val Float           = "float"
  val Boolean         = "boolean"
  val Date            = "date"
  val NamedEntity     = "named_entity"
  val NaturalLanguage = "natural_language"
  val Str             = "string"

  /** All 7 types, in the order used for table-embedding concatenation. */
  val All: Seq[String] =
    Seq(Int, Float, Boolean, Date, NamedEntity, NaturalLanguage, Str)

  /** The 6 types used for 1800-dim table embeddings (§4.2): boolean
    * columns are compared by true-ratio, not CoLR, so they contribute no
    * embedding block.
    */
  val Embeddable: Seq[String] =
    Seq(Int, Float, Date, NamedEntity, NaturalLanguage, Str)

  def isNumeric(t: String): Boolean = t == Int || t == Float
}
