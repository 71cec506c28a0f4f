package repro.sim

/** Tokenization helpers shared by all representation models. */
object Tokenize {

  /** Lowercase word tokens: maximal runs of letters/digits. */
  def tokens(s: String): Array[String] = {
    if (s == null) return Array.empty
    val out = Array.newBuilder[String]
    val sb = new StringBuilder
    var i = 0
    while (i < s.length) {
      val c = s.charAt(i)
      if (Character.isLetterOrDigit(c)) sb.append(Character.toLowerCase(c))
      else if (sb.nonEmpty) { out += sb.toString(); sb.clear() }
      i += 1
    }
    if (sb.nonEmpty) out += sb.toString()
    out.result()
  }

  /** Character n-grams of the lowercased string, spaces included, as in
    * the paper's "Joe Biden" example ({'Joe', 'oe ', 'e B', …}). Strings
    * shorter than n yield the string itself (single gram) if non-empty.
    */
  def charNGrams(s: String, n: Int): Array[String] = {
    if (s == null) return Array.empty
    val t = s.toLowerCase.trim
    if (t.isEmpty) Array.empty
    else if (t.length <= n) Array(t)
    else Array.tabulate(t.length - n + 1)(i => t.substring(i, i + n))
  }

  /** Token n-grams: sequences of n consecutive word tokens joined by a
    * single space. n=1 reduces to plain tokens.
    */
  def tokenNGrams(s: String, n: Int): Array[String] = {
    val ts = tokens(s)
    if (ts.length < n) { if (ts.isEmpty) Array.empty else Array(ts.mkString(" ")) }
    else Array.tabulate(ts.length - n + 1)(i => ts.slice(i, i + n).mkString(" "))
  }

  /** N-grams of the requested kind: `char` selects character grams. */
  def nGrams(s: String, n: Int, char: Boolean): Array[String] =
    if (char) charNGrams(s, n) else tokenNGrams(s, n)
}
