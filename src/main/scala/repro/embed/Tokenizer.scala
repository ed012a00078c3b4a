package repro.embed

import scala.collection.mutable.ArrayBuffer

/** Schema-agnostic tokenizer shared by every model and baseline.
  *
  * Splits on anything that is not a letter, digit or `_` (the Lexicon's
  * variant marker is part of the token, as a subword would be) and
  * lower-cases. Pure and allocation-light: used inside Spark map tasks.
  */
object Tokenizer extends Serializable {

  def tokenize(s: String): Array[String] = {
    val out = new ArrayBuffer[String](16)
    val sb  = new StringBuilder
    var i = 0
    while (i < s.length) {
      val c = s.charAt(i)
      if (Character.isLetterOrDigit(c) || c == '_') sb += Character.toLowerCase(c)
      else if (sb.nonEmpty) { out += sb.result(); sb.clear() }
      i += 1
    }
    if (sb.nonEmpty) out += sb.result()
    out.toArray
  }

  /** Character n-grams (3..4) of a token padded with `<`/`>`, as FastText. */
  def charNgrams(token: String, minN: Int = 3, maxN: Int = 4): Array[String] = {
    val padded = "<" + token + ">"
    val out = new ArrayBuffer[String](2 * padded.length)
    var n = minN
    while (n <= maxN) {
      var i = 0
      while (i + n <= padded.length) { out += padded.substring(i, i + n); i += 1 }
      n += 1
    }
    if (out.isEmpty) out += padded
    out.toArray
  }
}
