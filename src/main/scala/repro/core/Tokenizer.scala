package repro.core

/** Tokenizer for tokenized strings (Sec. II-A): splits a string into a
  * multiset of tokens on whitespace and punctuation — the scheme the paper
  * used for names on Google accounts ("tokenized using whitespaces and
  * punctuation characters"). Lower-cases for case-insensitive comparison;
  * empty tokens are dropped.
  */
object Tokenizer {

  /** Tokens of `s`, in input order (multiset semantics: duplicates kept). */
  def tokenize(s: String): Seq[String] =
    if (s == null) Seq.empty
    else s.toLowerCase.split("[^\\p{L}\\p{N}]+").iterator.filter(_.nonEmpty).toSeq

  /** Number of tokens, `T(x^t)` in the paper's notation. */
  def tokenCount(s: String): Int = tokenize(s).size

  /** Aggregate token length, `L(x^t)` in the paper's notation. */
  def aggLength(tokens: Seq[String]): Int = tokens.iterator.map(_.length).sum
}
