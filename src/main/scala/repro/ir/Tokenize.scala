package repro.ir

/** Shared tokenizer: lowercase, split on non-alphanumerics, drop empties.
  *
  * All IR providers and baselines tokenize identically so that effectiveness
  * differences come from the representation, not the preprocessing.
  */
object Tokenize {
  def tokens(s: String): Seq[String] =
    if (s == null) Seq.empty
    else s.toLowerCase.split("[^a-z0-9]+").iterator.filter(_.nonEmpty).toSeq

  /** Sentence form used for IR generation: attribute value as one document. */
  def sentence(s: String): String = tokens(s).mkString(" ")
}
