package repro.text

/** Text normalisation and tokenisation shared by the embedding substrate,
  * the rule blocker, the similarity features and the JedAI pipelines.
  *
  * Deliberately simple and deterministic: lowercase, strip punctuation to
  * spaces (keeping alphanumerics, which preserves model numbers like
  * "xj2000"), split on whitespace.
  */
object Tokenizer {

  def normalize(s: String): String = {
    val sb = new StringBuilder(s.length)
    var i = 0
    while (i < s.length) {
      val c = s.charAt(i)
      if (Character.isLetterOrDigit(c)) sb.append(Character.toLowerCase(c))
      else sb.append(' ')
      i += 1
    }
    sb.toString
  }

  def tokens(s: String): Array[String] =
    normalize(s).split("\\s+").filter(_.nonEmpty)

  /** Character trigrams of a token padded with '#', e.g. "cat" →
    * {"##c","#ca","cat","at#","t##"}. These give the simulated TPLM its
    * robustness to typos (a one-character edit perturbs only a few grams).
    */
  def trigrams(token: String): Array[String] = {
    val padded = "##" + token + "##"
    Array.tabulate(padded.length - 2)(i => padded.substring(i, i + 3))
  }

  /** Token multiset of a whole record: all attribute values concatenated. */
  def recordTokens(values: Seq[String]): Array[String] =
    values.toArray.flatMap(tokens)

  def jaccard(a: Set[String], b: Set[String]): Double = {
    if (a.isEmpty && b.isEmpty) 0.0
    else {
      val inter = a.intersect(b).size.toDouble
      inter / (a.size + b.size - inter)
    }
  }

  /** Overlap coefficient |A ∩ B| / min(|A|, |B|). */
  def overlap(a: Set[String], b: Set[String]): Double = {
    if (a.isEmpty || b.isEmpty) 0.0
    else a.intersect(b).size.toDouble / math.min(a.size, b.size)
  }
}
