package repro.data

import repro.linalg.Rng

/** Deterministic synthetic vocabularies for the data generators.
  *
  * Words are syllable compositions, so the token space is large (low
  * accidental collision between entities) yet reproducible from a seed.
  */
object Vocab {
  private val onsets = Vector("b", "br", "c", "ch", "d", "dr", "f", "g", "gr", "h", "j",
    "k", "kr", "l", "m", "n", "p", "pr", "r", "s", "sh", "st", "t", "tr", "v", "w", "z")
  private val nuclei = Vector("a", "e", "i", "o", "u", "ai", "ea", "io", "ou")
  private val codas = Vector("", "n", "m", "r", "l", "s", "t", "k", "nd", "rt", "x")

  def syllable(rng: Rng): String = rng.pick(onsets) + rng.pick(nuclei) + rng.pick(codas)

  /** A pronounceable pseudo-word of 2-3 syllables. */
  def word(rng: Rng): String = (0 until (2 + rng.nextInt(2))).map(_ => syllable(rng)).mkString

  def words(rng: Rng, n: Int): Vector[String] = Vector.fill(n)(word(rng))

  /** A pool of n distinct words (regenerates on collision). */
  def distinctWords(rng: Rng, n: Int): Vector[String] = {
    val seen = scala.collection.mutable.LinkedHashSet.empty[String]
    while (seen.size < n) seen += word(rng)
    seen.toVector
  }

  val genres = Vector("rock", "pop", "jazz", "folk", "electronic", "classical", "hiphop", "soul")
  val countries = Vector("usa", "uk", "france", "germany", "japan", "brazil", "sweden", "canada")
  val versionTokens = Vector("original", "remix", "live", "cover", "acoustic", "radio")
  val fillerTokens = Vector("official", "audio", "video", "hd", "feat", "new", "best", "deluxe")

  /** Pseudo-transliteration: a deterministic token-level bijection standing
    * in for a native-language rendering of a name (used for the C2 attribute
    * `name_native_language` — informative, but only populated in unseen
    * sources). */
  def transliterate(token: String): String = "x" + token.reverse

  /** Prefix abbreviation: "neil diamond" -> "ne di" (challenge C3). Short
    * prefixes collide across distinct names, so the abbreviated attribute is
    * far less informative — and actively misleading between entities that
    * share prefixes — exactly the Fig. 1 "P.M." phenomenon. */
  def abbreviate(tokens: Seq[String]): Seq[String] = tokens.map(_.take(2))
}
