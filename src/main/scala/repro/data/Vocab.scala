package repro.data

import scala.util.Random

/** Seeded vocabulary pools and string perturbation operators used by the
  * synthetic CCER dataset generator.
  *
  * Words are pronounceable consonant-vowel syllable strings, so that
  * character-level measures behave like they do on natural text (shared
  * prefixes, plausible typos), while pool sizes control how confusable
  * non-duplicate entities are.
  */
object Vocab {

  private val consonants = "bcdfghjklmnprstvwz".toCharArray
  private val vowels = "aeiou".toCharArray

  /** One pronounceable pseudo-word of 2–4 syllables. */
  def word(rnd: Random): String = {
    val syllables = 2 + rnd.nextInt(3)
    val sb = new StringBuilder
    for (_ <- 0 until syllables) {
      sb.append(consonants(rnd.nextInt(consonants.length)))
      sb.append(vowels(rnd.nextInt(vowels.length)))
      if (rnd.nextDouble() < 0.3) sb.append(consonants(rnd.nextInt(consonants.length)))
    }
    sb.toString()
  }

  /** A deterministic pool of `size` distinct pseudo-words. */
  def pool(size: Int, seed: Long): IndexedSeq[String] = {
    val rnd = new Random(seed)
    val set = scala.collection.mutable.LinkedHashSet[String]()
    while (set.size < size) set += word(rnd)
    set.toIndexedSeq
  }

  /** Alphanumeric model number like "TX-4821B". */
  def modelNo(rnd: Random): String = {
    val letters = "ABCDEFGHJKLMNPRSTUVWXYZ"
    val sb = new StringBuilder
    for (_ <- 0 until 2) sb.append(letters(rnd.nextInt(letters.length)))
    sb.append('-')
    for (_ <- 0 until 3 + rnd.nextInt(2)) sb.append(('0' + rnd.nextInt(10)).toChar)
    if (rnd.nextDouble() < 0.5) sb.append(letters(rnd.nextInt(letters.length)))
    sb.toString()
  }

  /** Ten-digit phone number "555-XXX-XXXX". */
  def phone(rnd: Random): String = {
    val sb = new StringBuilder("555-")
    for (i <- 0 until 7) {
      if (i == 3) sb.append('-')
      sb.append(('0' + rnd.nextInt(10)).toChar)
    }
    sb.toString()
  }

  /** One random character-level typo: substitution, deletion, insertion
    * or adjacent transposition (uniform choice).
    */
  def typo(s: String, rnd: Random): String = {
    if (s.length < 2) return s
    val i = rnd.nextInt(s.length)
    rnd.nextInt(4) match {
      case 0 => // substitute
        s.updated(i, ('a' + rnd.nextInt(26)).toChar)
      case 1 => // delete
        s.substring(0, i) + s.substring(i + 1)
      case 2 => // insert
        s.substring(0, i) + ('a' + rnd.nextInt(26)).toChar + s.substring(i)
      case _ => // transpose with the next char
        if (i >= s.length - 1) s
        else s.substring(0, i) + s.charAt(i + 1) + s.charAt(i) + s.substring(i + 2)
    }
  }

  /** Corrupt a digit string by replacing `count` random digits. */
  def digitNoise(s: String, count: Int, rnd: Random): String = {
    var out = s
    for (_ <- 0 until count) {
      val digitIdx = out.indices.filter(i => out.charAt(i).isDigit)
      if (digitIdx.nonEmpty) {
        val i = digitIdx(rnd.nextInt(digitIdx.length))
        out = out.updated(i, ('0' + rnd.nextInt(10)).toChar)
      }
    }
    out
  }

  /** Token-level perturbation of a multi-word value: per-token typos,
    * token drops (always keeping at least one token) and appended extra
    * tokens drawn from `extras`.
    */
  def perturb(
      value: String,
      rnd: Random,
      typoRate: Double,
      dropRate: Double,
      extraRate: Double,
      extras: IndexedSeq[String],
  ): String = {
    val tokens = value.split(' ').filter(_.nonEmpty).toBuffer
    // Drops first (never below one token).
    var i = 0
    while (i < tokens.length && tokens.length > 1) {
      if (rnd.nextDouble() < dropRate && tokens.length > 1) tokens.remove(i) else i += 1
    }
    // Typos per surviving token.
    for (k <- tokens.indices)
      if (rnd.nextDouble() < typoRate) tokens(k) = typo(tokens(k), rnd)
    // Extra tokens appended.
    if (extras.nonEmpty && rnd.nextDouble() < extraRate) {
      val count = 1 + rnd.nextInt(2)
      for (_ <- 0 until count) tokens += extras(rnd.nextInt(extras.length))
    }
    tokens.mkString(" ")
  }
}
