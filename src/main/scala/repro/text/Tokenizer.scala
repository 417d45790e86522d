package repro.text

/** Minimal deterministic tokenizer shared by all encoders.
  *
  * Splits on any non-alphanumeric character and lowercases, which is the
  * granularity at which the hashed token embeddings
  * ([[repro.embed.HashEmbedder]]) operate. Punctuation carries no signal in
  * the synthetic corpora, so it is dropped rather than kept as tokens.
  */
object Tokenizer {

  def tokenize(text: String): Array[String] = {
    val out = scala.collection.mutable.ArrayBuffer.empty[String]
    val sb = new StringBuilder
    var i = 0
    while (i < text.length) {
      val ch = text.charAt(i)
      if (Character.isLetterOrDigit(ch)) sb.append(Character.toLowerCase(ch))
      else if (sb.nonEmpty) { out += sb.toString; sb.clear() }
      i += 1
    }
    if (sb.nonEmpty) out += sb.toString
    out.toArray
  }

  /** Token count without materializing the token array. */
  def countTokens(text: String): Int = {
    var n = 0
    var inTok = false
    var i = 0
    while (i < text.length) {
      val d = Character.isLetterOrDigit(text.charAt(i))
      if (d && !inTok) n += 1
      inTok = d
      i += 1
    }
    n
  }
}
